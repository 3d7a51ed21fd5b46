package repro.quality

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.TestUtil
import repro.TestUtil.checkProp
import repro.baselines.ExactHAC
import repro.core.{Dendrogram, LocalGraph, SubgraphHAC}
import repro.core.model._

class MetricsSpec extends AnyFunSuite {

  private def lab(xs: Long*): Map[Long, Long] =
    xs.zipWithIndex.map { case (c, i) => i.toLong -> c }.toMap

  // ------------------------------------------------------------------ ARI

  test("ARI of identical clusterings is 1") {
    assert(Metrics.ari(lab(0, 0, 1, 1), lab(5, 5, 9, 9)) == 1.0)
  }

  test("ARI known value (sklearn doc example) = 4/7") {
    val a = lab(0, 0, 1, 1)
    val b = lab(0, 0, 1, 2)
    assert(math.abs(Metrics.ari(a, b) - 4.0 / 7.0) < 1e-12)
  }

  test("ARI of orthogonal clusterings is ≤ 0") {
    val a = lab(0, 0, 1, 1)
    val b = lab(0, 1, 0, 1)
    assert(Metrics.ari(a, b) <= 0.0 + 1e-12)
  }

  test("ARI is symmetric") {
    val a = lab(0, 0, 1, 2, 2, 1)
    val b = lab(0, 1, 1, 2, 0, 2)
    assert(math.abs(Metrics.ari(a, b) - Metrics.ari(b, a)) < 1e-12)
  }

  test("ARI is invariant under label permutation (property)") {
    val gen = Gen.listOfN(12, Gen.choose(0L, 3L))
    checkProp(Prop.forAll(gen, gen) { (xs: List[Long], ys: List[Long]) =>
      val a = xs.zipWithIndex.map { case (c, i) => i.toLong -> c }.toMap
      val b = ys.zipWithIndex.map { case (c, i) => i.toLong -> c }.toMap
      val bShift = b.map { case (k, v) => k -> (v + 100L) }
      math.abs(Metrics.ari(a, b) - Metrics.ari(a, bShift)) < 1e-12
    })
  }

  test("ARI rejects mismatched key sets") {
    assertThrows[IllegalArgumentException] {
      Metrics.ari(Map(1L -> 1L), Map(2L -> 1L))
    }
  }

  // ------------------------------------------------------------------ NMI

  test("NMI of identical clusterings is 1") {
    assert(math.abs(Metrics.nmi(lab(0, 0, 1, 1), lab(7, 7, 3, 3)) - 1.0) < 1e-12)
  }

  test("NMI of independent clusterings is 0") {
    assert(Metrics.nmi(lab(0, 0, 1, 1), lab(0, 1, 0, 1)) < 1e-12)
  }

  test("NMI against the trivial one-cluster labeling is 0") {
    assert(Metrics.nmi(lab(0, 0, 1, 1), lab(0, 0, 0, 0)) < 1e-12)
  }

  test("NMI hand value: [0,0,1,1] vs [0,0,1,2]") {
    // H(a) = ln2; H(b) = -(1/2 ln 1/2 + 2 * 1/4 ln 1/4) = 1.5 ln2 - ... compute:
    val h = -(0.5 * math.log(0.5) + 0.25 * math.log(0.25) * 2)
    val mi = 0.5 * math.log(0.5 / (0.5 * 0.5)) +
      0.25 * math.log(0.25 / (0.5 * 0.25)) +
      0.25 * math.log(0.25 / (0.5 * 0.25))
    val expected = mi / ((math.log(2) + h) / 2)
    assert(math.abs(Metrics.nmi(lab(0, 0, 1, 1), lab(0, 0, 1, 2)) - expected) < 1e-12)
  }

  test("NMI is symmetric") {
    val a = lab(0, 0, 1, 2, 2, 1)
    val b = lab(0, 1, 1, 2, 0, 2)
    assert(math.abs(Metrics.nmi(a, b) - Metrics.nmi(b, a)) < 1e-12)
  }

  // ------------------------------------------------------------- purity

  private val A = IdOffset + 1L
  private val B = IdOffset + 3L
  private val C = IdOffset + 2L
  private def tree(pairs: ((Long, Long), (Long, Long))): Dendrogram = {
    val ((a1, a2), (b1, b2)) = pairs
    Dendrogram.fromRows(
      Seq(DendroRow(a1, A, 0.9), DendroRow(a2, A, 0.9),
          DendroRow(b1, B, 0.8), DendroRow(b2, B, 0.8),
          DendroRow(A, C, 0.3), DendroRow(B, C, 0.3)),
      Seq(0L, 1L, 2L, 3L))
  }

  test("purity = 1 when classes are tree-consistent") {
    val labels = Map(0L -> 10L, 1L -> 10L, 2L -> 20L, 3L -> 20L)
    assert(math.abs(Metrics.dendrogramPurity(tree((0L, 1L) -> (2L, 3L)), labels) - 1.0) < 1e-12)
  }

  test("purity = 0.5 for a fully crossed tree (hand computed)") {
    val labels = Map(0L -> 10L, 1L -> 10L, 2L -> 20L, 3L -> 20L)
    // tree ((0,2),(1,3)): every same-class pair meets at the root, purity 2/4
    assert(math.abs(Metrics.dendrogramPurity(tree((0L, 2L) -> (1L, 3L)), labels) - 0.5) < 1e-12)
  }

  test("purity of a forest uses the virtual root for cross-root pairs") {
    // two disjoint trees, one class split across them
    val d = Dendrogram.fromRows(
      Seq(DendroRow(0L, A, 0.9), DendroRow(1L, A, 0.9)),
      Seq(0L, 1L, 2L, 3L))
    val labels = Map(0L -> 10L, 1L -> 20L, 2L -> 10L, 3L -> 20L)
    // pairs: (0,2) class 10: lca virtual root, purity 2/4; (1,3): same.
    // pair inside A: none same-class. → 0.5
    assert(math.abs(Metrics.dendrogramPurity(d, labels) - 0.5) < 1e-12)
  }

  test("purity is 1 for all-singleton classes") {
    val labels = Map(0L -> 1L, 1L -> 2L, 2L -> 3L, 3L -> 4L)
    assert(Metrics.dendrogramPurity(tree((0L, 1L) -> (2L, 3L)), labels) == 1.0)
  }

  // ------------------------------------------------------------ Dasgupta

  test("Dasgupta cost hand-computed on a 4-leaf tree") {
    val d = tree((0L, 1L) -> (2L, 3L))
    val sims = Vector(
      (0L, 1L, 0.9), (2L, 3L, 0.8),
      (0L, 2L, 0.1), (0L, 3L, 0.2), (1L, 2L, 0.3), (1L, 3L, 0.4))
    val expected = 2 * 0.9 + 2 * 0.8 + 4 * (0.1 + 0.2 + 0.3 + 0.4)
    assert(math.abs(Metrics.dasguptaCost(d, sims) - expected) < 1e-9)
  }

  test("Dasgupta cost charges cross-root pairs the full leaf count") {
    val d = Dendrogram.fromRows(
      Seq(DendroRow(0L, A, 0.9), DendroRow(1L, A, 0.9)),
      Seq(0L, 1L, 2L))
    val sims = Vector((0L, 1L, 0.5), (0L, 2L, 0.2), (1L, 2L, 0.1))
    val expected = 2 * 0.5 + 3 * (0.2 + 0.1)
    assert(math.abs(Metrics.dasguptaCost(d, sims) - expected) < 1e-9)
  }

  test("Dasgupta: better trees cost less on separable data") {
    val sims = Vector(
      (0L, 1L, 0.9), (2L, 3L, 0.9),
      (0L, 2L, 0.1), (0L, 3L, 0.1), (1L, 2L, 0.1), (1L, 3L, 0.1))
    val good = Metrics.dasguptaCost(tree((0L, 1L) -> (2L, 3L)), sims)
    val bad = Metrics.dasguptaCost(tree((0L, 2L) -> (1L, 3L)), sims)
    assert(good < bad)
  }

  // ---------------------------------------------------- precision/recall

  test("precision/recall hand check") {
    val clusters = Map(0L -> 1L, 1L -> 1L, 2L -> 2L, 3L -> 2L)
    val pairs = Seq(
      (0L, 1L, true),  // tp
      (2L, 3L, false), // fp
      (0L, 2L, true),  // fn
      (1L, 3L, false)) // tn
    val (p, r) = Metrics.precisionRecall(clusters, pairs)
    assert(p == 0.5 && r == 0.5)
  }

  test("precision/recall: perfect clustering") {
    val clusters = Map(0L -> 1L, 1L -> 1L, 2L -> 2L)
    val pairs = Seq((0L, 1L, true), (0L, 2L, false))
    assert(Metrics.precisionRecall(clusters, pairs) == ((1.0, 1.0)))
  }

  test("precision/recall treats unknown ids as split") {
    val (p, r) = Metrics.precisionRecall(Map(0L -> 1L), Seq((0L, 99L, true)))
    assert(p == 1.0 && r == 0.0)
  }

  // --------------------------------------- empirical approximation ratio

  test("exact HAC has empirical approximation ratio 1") {
    for (seed <- 1 to 4) {
      val edges = TestUtil.randomConnectedGraph(25, 40, seed)
      val d = ExactHAC.dendrogram(edges)
      val ratio = Metrics.empiricalApproxRatio(edges, d)
      assert(ratio <= 1.0 + 1e-9, s"seed=$seed ratio=$ratio")
    }
  }

  test("a deliberately bad dendrogram has ratio > 1") {
    // chain 0-1-2 with w(0,1)=0.2, w(1,2)=0.9; merging (0,1) first is a
    // 4.5-approximate move
    val edges = Vector((0L, 1L, 0.2), (1L, 2L, 0.9))
    val n1 = IdOffset + 1L
    val n2 = IdOffset + 2L
    val d = Dendrogram.fromRows(
      Seq(DendroRow(0L, n1, 0.2), DendroRow(1L, n1, 0.2),
          DendroRow(n1, n2, 0.45), DendroRow(2L, n2, 0.45)),
      Seq(0L, 1L, 2L))
    val ratio = Metrics.empiricalApproxRatio(edges, d)
    assert(math.abs(ratio - 0.9 / 0.2) < 1e-9)
  }

  test("greedy replay ratio matches SubgraphHAC's ε bound") {
    val eps = 0.2
    val edges = TestUtil.randomConnectedGraph(30, 60, seed = 41)
    val g = LocalGraph.fromEdges(edges)
    val leaves = g.vertices.toVector
    val res = SubgraphHAC.run(g, eps)
    val d = Dendrogram.fromRows(res.merges, leaves)
    assert(Metrics.empiricalApproxRatio(edges, d) <= (1 + eps) * (1 + 1e-6))
  }

  test("replay id mismatch is detected") {
    val edges = Vector((0L, 1L, 0.5))
    val d = Dendrogram.fromRows(
      Seq(DendroRow(0L, IdOffset + 7L, 0.5), DendroRow(1L, IdOffset + 7L, 0.5)),
      Seq(0L, 1L))
    assertThrows[IllegalArgumentException] {
      Metrics.empiricalApproxRatio(edges, d)
    }
  }
}
