package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.TestUtil
import repro.TestUtil.checkProp
import repro.core.model._

class LocalGraphSpec extends AnyFunSuite {

  private def triangle(): LocalGraph =
    LocalGraph.fromEdges(Seq((0L, 1L, 0.9), (1L, 2L, 0.5), (0L, 2L, 0.2)))

  test("fromEdges builds singleton metadata") {
    val g = triangle()
    assert(g.numVertices == 3)
    assert(g.size(0L) == 1L && g.size(2L) == 1L)
    assert(g.minMerge(1L).isPosInfinity)
    assert(g.minLeaf(1L) == 1L)
    assert(g.isActive(0L) && g.isActive(1L) && g.isActive(2L))
  }

  test("weight lookups are symmetric") {
    val g = triangle()
    assert(g.weight(0L, 1L).contains(0.9))
    assert(g.weight(1L, 0L).contains(0.9))
    assert(g.weight(0L, 2L).contains(0.2))
    assert(g.weight(0L, 3L).isEmpty)
  }

  test("wmax reflects the max incident weight") {
    val g = triangle()
    assert(g.wmax(0L) == 0.9)
    assert(g.wmax(1L) == 0.9)
    assert(g.wmax(2L) == 0.5)
  }

  test("maxEdgeWeight over the whole graph") {
    assert(triangle().maxEdgeWeight == 0.9)
  }

  test("undirectedEdges lists each pair once with u < v") {
    val e = triangle().undirectedEdges.toVector.sorted
    assert(e == Vector((0L, 1L, 0.9), (0L, 2L, 0.2), (1L, 2L, 0.5)))
  }

  test("merge uses average-linkage arithmetic") {
    val g = triangle()
    val res = g.merge(0L, 1L)
    // w({0,1},2) = (0.2*1 + 0.5*1)/2 = 0.35
    assert(math.abs(g.weight(res.newId, 2L).get - 0.35) < 1e-12)
  }

  test("merge id is IdOffset + max(minLeaf)") {
    val g = triangle()
    assert(g.merge(0L, 1L).newId == IdOffset + 1L)
  }

  test("merged metadata: size, minMerge, minLeaf") {
    val g = triangle()
    val res = g.merge(1L, 2L) // sim 0.5
    assert(g.size(res.newId) == 2L)
    assert(g.minMerge(res.newId) == 0.5)
    assert(g.minLeaf(res.newId) == 1L)
  }

  test("second merge consumes the new cluster's minLeaf correctly") {
    val g = triangle()
    val r1 = g.merge(0L, 1L) // minLeaf 0, consumed 1
    val r2 = g.merge(r1.newId, 2L) // consumes 2
    assert(r2.newId == IdOffset + 2L)
    assert(g.minLeaf(r2.newId) == 0L)
    assert(g.size(r2.newId) == 3L)
  }

  test("M(v) chains through merges (Definition 2)") {
    val g = triangle()
    val r1 = g.merge(0L, 1L) // w=0.9
    assert(g.minMerge(r1.newId) == 0.9)
    val w12 = g.weight(r1.newId, 2L).get // 0.35
    val r2 = g.merge(r1.newId, 2L)
    assert(g.minMerge(r2.newId) == math.min(0.9, w12))
  }

  test("merge removes the old vertices") {
    val g = triangle()
    val res = g.merge(0L, 1L)
    assert(!g.contains(0L) && !g.contains(1L))
    assert(g.contains(res.newId) && g.contains(2L))
  }

  test("merge reports neighbors whose wmax decreased") {
    // star around 2: w(2,0)=0.9 is 2's max; merging 0,1 dilutes it
    val g = LocalGraph.fromEdges(Seq((2L, 0L, 0.9), (2L, 1L, 0.8), (0L, 1L, 0.85)))
    val res = g.merge(0L, 1L)
    // w({0,1},2) = (0.9+0.8)/2 = 0.85 < 0.9 = old wmax(2)
    assert(res.wmaxDecreased == List(2L))
    assert(math.abs(g.wmax(2L) - 0.85) < 1e-12)
  }

  test("merge does not report neighbors whose wmax is unchanged") {
    // vertex 3 has a stronger edge elsewhere
    val g = LocalGraph.fromEdges(
      Seq((0L, 1L, 0.5), (0L, 3L, 0.2), (3L, 4L, 0.9)))
    val res = g.merge(0L, 1L)
    assert(!res.wmaxDecreased.contains(3L))
    assert(g.wmax(3L) == 0.9)
  }

  test("wmax never increases for surviving vertices (Lemma 1)") {
    val edges = TestUtil.randomConnectedGraph(40, 60, seed = 5)
    val g = LocalGraph.fromEdges(edges)
    val rng = new scala.util.Random(7)
    var steps = 0
    while (g.numEdges > 0 && steps < 39) {
      val live = g.undirectedEdges.toVector
      val (u, v, _) = live(rng.nextInt(live.size))
      val before = g.vertices.filter(x => x != u && x != v)
        .map(x => x -> g.wmax(x)).toMap
      g.merge(u, v)
      for ((x, w) <- before)
        assert(g.wmax(x) <= w + 1e-12, s"wmax($x) increased")
      steps += 1
    }
  }

  test("goodness matches Definition 2 on a fresh graph") {
    val g = triangle()
    // singleton M = ∞ so denominator = w(uv)
    assert(math.abs(g.goodness(0L, 1L) - 0.9 / 0.9) < 1e-12)
    assert(math.abs(g.goodness(1L, 2L) - 0.9 / 0.5) < 1e-12)
    assert(math.abs(g.goodness(0L, 2L) - 0.9 / 0.2) < 1e-12)
  }

  test("goodness uses M after merges") {
    val g = LocalGraph.fromEdges(
      Seq((0L, 1L, 1.0), (1L, 2L, 1.1), (2L, 3L, 1.21)))
    val r = g.merge(0L, 1L)
    // Fig. 4: goodness({0,1},2) = max(wmax)/min(M=1.0, ∞, w) = 1.21/... with
    // w({0,1},2) = 1.1/2 = 0.55 → denominator min(1.0, 0.55) = 0.55
    val expected = math.max(g.wmax(r.newId), g.wmax(2L)) /
      math.min(math.min(1.0, Double.PositiveInfinity), g.weight(r.newId, 2L).get)
    assert(math.abs(g.goodness(r.newId, 2L) - expected) < 1e-12)
  }

  test("contracted: identity assignment preserves the graph") {
    val edges = TestUtil.randomGraph(20, 0.3, seed = 3)
    val g = LocalGraph.fromEdges(edges)
    val c = LocalGraph.contracted(g, identity)
    assert(c.numVertices == g.numVertices)
    for ((u, v, w) <- g.undirectedEdges)
      assert(math.abs(c.weight(u, v).get - w) < 1e-12)
  }

  test("contracted: grouping computes raw-sum average linkage") {
    // 0,1 → A; 2 → itself. w(A,2) = (w(0,2)+w(1,2))/(2*1)
    val g = LocalGraph.fromEdges(Seq((0L, 1L, 0.9), (0L, 2L, 0.4), (1L, 2L, 0.6)))
    val c = LocalGraph.contracted(g, v => if (v <= 1) 0L else v)
    assert(c.numVertices == 2)
    assert(c.size(0L) == 2L)
    assert(math.abs(c.weight(0L, 2L).get - 0.5) < 1e-12)
  }

  test("contracted drops intra-cluster edges") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L, 0.9), (0L, 2L, 0.4)))
    val c = LocalGraph.contracted(g, v => if (v <= 1) 0L else v)
    assert(c.weight(0L, 0L).isEmpty)
    assert(c.numEdges == 1)
  }

  test("contracted aggregates minMerge and minLeaf with min") {
    val g = LocalGraph.fromEdges(Seq((0L, 1L, 0.9), (1L, 2L, 0.2)))
    g.merge(0L, 1L) // M = 0.9
    val z = IdOffset + 1L
    val c = LocalGraph.contracted(g, v => if (v == z || v == 2L) 99L else v)
    assert(c.minMerge(99L) == 0.9)
    assert(c.minLeaf(99L) == 0L)
    assert(c.size(99L) == 3L)
  }

  test("property: merged neighbor weight is the size-weighted mean") {
    val gen = for {
      w1 <- Gen.choose(0.01, 1.0)
      w2 <- Gen.choose(0.01, 1.0)
      w3 <- Gen.choose(0.01, 1.0)
    } yield (w1, w2, w3)
    checkProp(Prop.forAll(gen) { case (w1, w2, w3) =>
      val g = LocalGraph.fromEdges(Seq((0L, 1L, w1), (0L, 2L, w2), (1L, 2L, w3)))
      val r = g.merge(0L, 1L)
      math.abs(g.weight(r.newId, 2L).get - (w2 + w3) / 2.0) < 1e-12
    })
  }

  test("property: reducibility — merged weight ≤ max of constituents") {
    checkProp(Prop.forAll(Gen.choose(1L, 1000L)) { seed: Long =>
      val edges = TestUtil.randomConnectedGraph(12, 10, seed)
      val g = LocalGraph.fromEdges(edges)
      val (u, v, _) = g.undirectedEdges.next()
      val wu = g.nbrs(u).toMap
      val wv = g.nbrs(v).toMap
      val r = g.merge(u, v)
      g.nbrs(r.newId).forall { case (a, w) =>
        w <= math.max(wu.getOrElse(a, 0.0), wv.getOrElse(a, 0.0)) + 1e-12
      }
    })
  }

  test("original ids must be below IdOffset") {
    assertThrows[IllegalArgumentException] {
      LocalGraph.fromEdges(Seq((IdOffset + 1L, 2L, 0.5)))
    }
  }

  test("self loops are rejected") {
    val g = new LocalGraph
    g.ensureVertex(1L, 1L, Double.PositiveInfinity, 1L, isActive = true)
    assertThrows[IllegalArgumentException] { g.addEdge(1L, 1L, 0.5) }
  }
}
