package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.{Dendrogram, LocalGraph}
import repro.quality.Metrics

class ParHACSpec extends AnyFunSuite {

  test("merges only edges within (1+ε) of the global max each round") {
    val edges = TestUtil.randomConnectedGraph(30, 60, seed = 1)
    val eps = 0.2
    val res = ParHAC.simulate(LocalGraph.fromEdges(edges), eps)
    TestUtil.replay(edges, TestUtil.mergeTriples(res.merges)) { (g, u, v) =>
      // the merged edge is within (1+eps) of the max at its merge time —
      // within a round the max only decreases, so this is the strict check
      val w = g.weight(u, v).get
      assert(w * (1 + eps) >= g.maxEdgeWeight - 1e-12)
    }
  }

  test("resulting dendrogram is (1+ε)-approximate") {
    for (seed <- 1 to 3) {
      val eps = 0.15
      val edges = TestUtil.randomConnectedGraph(25, 50, seed)
      val res = ParHAC.simulate(LocalGraph.fromEdges(edges), eps)
      val leaves = edges.flatMap(e => Seq(e._1, e._2)).distinct
      val d = Dendrogram.fromRows(res.merges, leaves)
      assert(Metrics.empiricalApproxRatio(edges, d) <= (1 + eps) * (1 + 1e-9))
    }
  }

  test("connected graphs merge completely") {
    val edges = TestUtil.randomConnectedGraph(20, 40, seed = 2)
    val g = LocalGraph.fromEdges(edges)
    ParHAC.simulate(g, 0.1)
    assert(g.numVertices == 1)
  }

  test("ε=0 merges only global-max edges (one weight class per round)") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L, 0.9), (1L, 2L, 0.8), (2L, 3L, 0.7)))
    val res = ParHAC.simulate(g, 0.0)
    val sims = TestUtil.mergeTriples(res.merges).map(_._4)
    assert(sims.head == 0.9)
  }

  test("threshold stops below-t merges") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L, 0.9), (1L, 2L, 0.05)))
    val res = ParHAC.simulate(g, 0.1, t = 0.1)
    assert(TestUtil.mergeTriples(res.merges).size == 1)
  }

  test("rounds are at least log-ish in the weight range") {
    // geometric weights force many buckets: rounds ≥ number of (1+eps)
    // bands present
    val edges = (0 until 20).map(i =>
      (i.toLong, (i + 1).toLong, math.pow(0.7, i)))
    val res = ParHAC.simulate(LocalGraph.fromEdges(edges), eps = 0.1)
    assert(res.rounds >= 5)
  }

  test("maxRounds cap is reported") {
    val edges = TestUtil.randomConnectedGraph(30, 60, seed = 3)
    val res = ParHAC.simulate(LocalGraph.fromEdges(edges), 0.05, maxRounds = 1)
    assert(res.cappedOut)
  }
}
