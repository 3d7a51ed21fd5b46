package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.model._

class SubgraphHACSpec extends AnyFunSuite {

  private def allActive(edges: Iterable[(Long, Long, Double)]): LocalGraph =
    LocalGraph.fromEdges(edges)

  // ------------------------------------------------------------ Fig. 4

  private def fig4(eps: Double): Seq[(Long, Long, Double)] = {
    val e = 1.0 + eps
    Seq((0L, 1L, 1.0), (1L, 2L, e), (2L, 3L, e * e))
  }

  test("Fig. 4: merging ab is good, then abc is not, cd is forced") {
    val eps = 0.1
    val g = allActive(fig4(eps))
    assert(g.isGood(0L, 1L, eps)) // goodness = (1+eps)/1
    assert(g.isGood(2L, 3L, eps)) // goodness = 1
    val r = g.merge(0L, 1L)
    // merge of {a,b} with c must now be blocked by M({a,b}) = 1
    assert(!g.isGood(r.newId, 2L, eps))
    assert(g.isGood(2L, 3L, eps))
  }

  test("Fig. 4: SubgraphHAC merges ab and cd first, never abc") {
    val eps = 0.1
    val g = allActive(fig4(eps))
    val res = SubgraphHAC.run(g, eps)
    val triples = TestUtil.mergeTriples(res.merges)
    // first two merges are {0,1} and {2,3} in some order
    val firstTwo = triples.take(2).map(t => Set(t._1, t._2)).toSet
    assert(firstTwo == Set(Set(0L, 1L), Set(2L, 3L)))
  }

  // ----------------------------------------------- Observation 1 (ε=0)

  test("Observation 1: every ε=0 merge is a reciprocal max merge") {
    for (seed <- 1 to 5) {
      val edges = TestUtil.randomConnectedGraph(30, 40, seed)
      val res = SubgraphHAC.run(allActive(edges), eps = 0.0)
      TestUtil.replay(edges, TestUtil.mergeTriples(res.merges)) { (g, u, v) =>
        val w = g.weight(u, v).get
        assert(math.abs(w - g.wmax(u)) <= 1e-9 * w, s"w($u,$v) != wmax($u)")
        assert(math.abs(w - g.wmax(v)) <= 1e-9 * w, s"w($u,$v) != wmax($v)")
      }
    }
  }

  // --------------------------------------------------- Lemma 2 invariant

  test("Lemma 2: wmax(v)/M(v) ≤ 1+ε after every good merge") {
    for (eps <- Seq(0.0, 0.1, 0.5); seed <- 1 to 3) {
      val edges = TestUtil.randomConnectedGraph(25, 35, seed)
      val res = SubgraphHAC.run(allActive(edges), eps)
      val g2 = TestUtil.replay(edges, TestUtil.mergeTriples(res.merges)) { (g, _, _) =>
        for (v <- g.vertices)
          assert(g.wmax(v) / g.minMerge(v) <= (1 + eps) * (1 + 1e-9) + 1e-12)
      }
      for (v <- g2.vertices)
        assert(g2.wmax(v) / g2.minMerge(v) <= (1 + eps) * (1 + 1e-9) + 1e-12)
    }
  }

  // ------------------------------------------------------ goodness gating

  test("every performed merge was good at merge time") {
    for (eps <- Seq(0.0, 0.1, 0.3)) {
      val edges = TestUtil.randomConnectedGraph(30, 60, seed = 11)
      val res = SubgraphHAC.run(allActive(edges), eps)
      TestUtil.replay(edges, TestUtil.mergeTriples(res.merges)) { (g, u, v) =>
        assert(g.isGood(u, v, eps), s"merge $u,$v was not $eps-good")
      }
    }
  }

  test("maximality: no good active-active edge remains on termination") {
    for (eps <- Seq(0.0, 0.1, 0.4); seed <- 1 to 3) {
      val edges = TestUtil.randomConnectedGraph(25, 40, seed)
      val g = allActive(edges)
      SubgraphHAC.run(g, eps)
      for ((u, v, _) <- g.undirectedEdges if g.isActive(u) && g.isActive(v))
        assert(g.goodness(u, v) > (1 + eps) * (1 + FpSlack) - 1e-12,
          s"good edge $u-$v left unmerged")
    }
  }

  test("ε=0 on a connected graph with distinct weights merges everything") {
    val edges = TestUtil.randomConnectedGraph(20, 30, seed = 2)
    val g = allActive(edges)
    val res = SubgraphHAC.run(g, 0.0)
    // exact HAC merges all of a connected graph: single active cluster left
    assert(g.active.size == 1)
    assert(res.merges.size == 2 * 19)
  }

  // --------------------------------------------------- inactive vertices

  test("inactive vertices are never merged") {
    val edges = Seq((0L, 1L, 0.9), (1L, 2L, 0.8), (2L, 3L, 0.95))
    val g = LocalGraph.fromEdges(edges)
    g.active.remove(2L)
    g.active.remove(3L)
    val res = SubgraphHAC.run(g, eps = 0.5)
    val merged = TestUtil.mergeTriples(res.merges).flatMap(t => Seq(t._1, t._2))
    assert(!merged.contains(2L) && !merged.contains(3L))
    assert(g.contains(2L) && g.contains(3L))
  }

  test("inactive neighbors still gate goodness through wmax") {
    // active 0,1 with w=0.5; inactive 2 adjacent to 1 with w=0.9:
    // goodness(0,1) = 0.9/0.5 = 1.8 > 1+eps → no merge
    val g = LocalGraph.fromEdges(Seq((0L, 1L, 0.5), (1L, 2L, 0.9)))
    g.active.remove(2L)
    val res = SubgraphHAC.run(g, eps = 0.5)
    assert(res.merges.isEmpty)
  }

  test("assignment covers every initially-active vertex") {
    val edges = TestUtil.randomConnectedGraph(30, 30, seed = 4)
    val g = allActive(edges)
    val ids = g.vertices.toSet
    val res = SubgraphHAC.run(g, 0.1)
    assert(res.assignment.keySet == ids)
    // every target is a final active cluster
    val finals = res.meta.map(_.id).toSet
    assert(res.assignment.values.toSet.subsetOf(finals))
  }

  test("meta rows carry merged sizes summing to the vertex count") {
    val edges = TestUtil.randomConnectedGraph(30, 30, seed = 9)
    val res = SubgraphHAC.run(allActive(edges), 0.1)
    assert(res.meta.map(_.size).sum == 30L)
  }

  test("unmerged vertices map to themselves with untouched metadata") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L, 0.5), (1L, 2L, 0.9)))
    g.active.remove(2L) // 0,1 blocked by inactive 2 (see earlier test)
    val res = SubgraphHAC.run(g, 0.2)
    assert(res.assignment == Map(0L -> 0L, 1L -> 1L))
    assert(res.meta.exists(m => m.id == 0L && m.size == 1L && m.minMerge.isPosInfinity))
  }

  test("dendrogram rows pair up and parents are unique per merge") {
    val edges = TestUtil.randomConnectedGraph(40, 50, seed = 6)
    val res = SubgraphHAC.run(allActive(edges), 0.1)
    val triples = TestUtil.mergeTriples(res.merges)
    val parents = triples.map(_._3)
    assert(parents.distinct.size == parents.size)
    assert(parents.forall(_ >= IdOffset))
  }

  test("resulting dendrogram validates as a binary forest") {
    val edges = TestUtil.randomConnectedGraph(40, 80, seed = 8)
    val g = allActive(edges)
    val leaves = g.vertices.toVector
    val res = SubgraphHAC.run(g, 0.1)
    val d = Dendrogram.fromRows(res.merges, leaves)
    d.validate()
  }

  test("empirical approximation ratio of one call is ≤ 1+ε (Lemma 4)") {
    for (eps <- Seq(0.0, 0.1, 0.25); seed <- 1 to 3) {
      val edges = TestUtil.randomConnectedGraph(30, 60, seed)
      val g = allActive(edges)
      val leaves = g.vertices.toVector
      val res = SubgraphHAC.run(g, eps)
      val d = Dendrogram.fromRows(res.merges, leaves)
      val ratio = repro.quality.Metrics.empiricalApproxRatio(edges, d)
      assert(ratio <= (1 + eps) * (1 + 1e-6),
        s"ratio $ratio exceeds 1+$eps (seed=$seed)")
    }
  }

  test("larger ε merges at least as much as ε=0 on the same graph") {
    val edges = TestUtil.randomConnectedGraph(50, 100, seed = 13)
    val m0 = SubgraphHAC.run(allActive(edges), 0.0).merges.size
    val m1 = SubgraphHAC.run(allActive(edges), 0.5).merges.size
    assert(m1 >= m0)
  }

  test("empty graph yields empty result") {
    val g = new LocalGraph
    val res = SubgraphHAC.run(g, 0.1)
    assert(res.merges.isEmpty && res.assignment.isEmpty && res.meta.isEmpty)
  }

  test("two-vertex graph merges its single edge") {
    val res = SubgraphHAC.run(allActive(Seq((3L, 7L, 0.5))), 0.0)
    val triples = TestUtil.mergeTriples(res.merges)
    assert(triples == Vector((3L, 7L, IdOffset + 7L, 0.5)))
  }

  test("carried-in M values restrict merges across rounds") {
    // cluster 0 was built with a low M; merging it with 1 would violate
    // goodness even though w(0,1) is its max edge
    val g = new LocalGraph
    g.ensureVertex(0L, 2L, 0.1, 0L, isActive = true) // M(0) = 0.1
    g.ensureVertex(1L, 1L, Double.PositiveInfinity, 1L, isActive = true)
    g.addEdge(0L, 1L, 0.5)
    // goodness = 0.5 / min(0.1, ∞, 0.5) = 5
    assert(SubgraphHAC.run(g, eps = 0.5).merges.isEmpty)
  }
}
