package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.LocalGraph
import repro.core.model._

class ExactHACSpec extends AnyFunSuite {

  test("single edge merges once") {
    val rows = ExactHAC.run(LocalGraph.fromEdges(Seq((0L, 1L, 0.5))))
    assert(TestUtil.mergeTriples(rows) == Vector((0L, 1L, IdOffset + 1L, 0.5)))
  }

  test("merges happen in globally non-increasing weight order") {
    val edges = TestUtil.randomConnectedGraph(30, 60, seed = 1)
    val rows = ExactHAC.run(LocalGraph.fromEdges(edges))
    // replay and verify each merged edge is the global max at its time
    TestUtil.replay(edges, TestUtil.mergeTriples(rows)) { (g, u, v) =>
      val w = g.weight(u, v).get
      assert(w >= g.maxEdgeWeight - 1e-12, s"merge $u-$v (w=$w) was not max")
    }
  }

  test("matches the naive O(n^3) reference merge-for-merge") {
    for (seed <- 1 to 5) {
      val edges = TestUtil.randomConnectedGraph(18, 25, seed)
      val got = TestUtil.mergeTriples(ExactHAC.run(LocalGraph.fromEdges(edges)))
      val ref = TestUtil.naiveHAC(edges)
      assert(got.size == ref.size, s"seed=$seed merge counts differ")
      for (((gu, gv, gz, gs), (ru, rv, rz, rs)) <- got.zip(ref)) {
        assert(Set(gu, gv) == Set(ru, rv), s"seed=$seed merge pair differs")
        assert(gz == rz)
        assert(math.abs(gs - rs) < 1e-9)
      }
    }
  }

  test("connected graph merges to a single cluster") {
    val edges = TestUtil.randomConnectedGraph(25, 50, seed = 2)
    val g = LocalGraph.fromEdges(edges)
    ExactHAC.run(g)
    assert(g.numVertices == 1)
    assert(g.numEdges == 0)
  }

  test("disconnected components never merge") {
    val c1 = Seq((0L, 1L, 0.5), (1L, 2L, 0.6))
    val c2 = Seq((10L, 11L, 0.7))
    val g = LocalGraph.fromEdges(c1 ++ c2)
    ExactHAC.run(g)
    assert(g.numVertices == 2)
  }

  test("stopBelow truncates the dendrogram") {
    val edges = Seq((0L, 1L, 0.9), (1L, 2L, 0.2))
    val g = LocalGraph.fromEdges(edges)
    val rows = ExactHAC.run(g, stopBelow = 0.3)
    // 0,1 merge (0.9); the contracted edge to 2 has weight 0.1 < 0.3
    assert(TestUtil.mergeTriples(rows).map(_._4) == Vector(0.9))
    assert(g.numVertices == 2)
  }

  test("dendrogram helper builds a valid dendrogram") {
    val edges = TestUtil.randomConnectedGraph(30, 60, seed = 3)
    val d = ExactHAC.dendrogram(edges)
    d.validate()
    assert(d.leaves.size == 30)
    assert(d.numMerges == 29)
    assert(d.roots.size == 1)
  }

  test("merge similarities recorded in the dendrogram match the replay") {
    val edges = TestUtil.randomConnectedGraph(20, 40, seed = 4)
    val rows = ExactHAC.run(LocalGraph.fromEdges(edges))
    val triples = TestUtil.mergeTriples(rows)
    TestUtil.replay(edges, triples) { (g, u, v) => () }
    // replay's internal assertion checks node ids; verify sims separately
    val g2 = LocalGraph.fromEdges(edges)
    for ((u, v, _, s) <- triples) {
      assert(math.abs(g2.weight(u, v).get - s) < 1e-12)
      g2.merge(u, v)
    }
  }

  test("average-linkage chain example (hand computed)") {
    // 0-1 w .8, 1-2 w .6, 2-3 w .9:
    // merge (2,3) .9; then w({23},1) = .3; merge (0,1) .8; w({01},{23}) = .15
    val edges = Seq((0L, 1L, 0.8), (1L, 2L, 0.6), (2L, 3L, 0.9))
    val triples = TestUtil.mergeTriples(ExactHAC.run(LocalGraph.fromEdges(edges)))
    assert(triples.map(_._4).map(s => math.rint(s * 100) / 100) ==
      Vector(0.9, 0.8, 0.15))
  }

  test("exact HAC of a pruned-threshold run is a prefix of the full run") {
    val edges = TestUtil.randomConnectedGraph(25, 40, seed = 5)
    val full = TestUtil.mergeTriples(ExactHAC.run(LocalGraph.fromEdges(edges)))
    val cut = TestUtil.mergeTriples(ExactHAC.run(LocalGraph.fromEdges(edges), 0.4))
    assert(full.take(cut.size) == cut)
    assert(cut.forall(_._4 > 0.4))
  }
}
