package repro.partition

import repro.{SparkSpec, TestUtil}

class ConnectedComponentsSpec extends SparkSpec {

  private def cc(vertices: Seq[Long], edges: Seq[(Long, Long)]): Map[Long, Long] = {
    import spark.implicits._
    val vs = vertices.toDF("id")
    val es = repro.graph.GraphOps.symmetrize(
      edges.map { case (u, v) => (u, v, 1.0) }.toDF("src", "dst", "w"))
    ConnectedComponents.run(vs, es).collect()
      .map(r => r.getLong(0) -> r.getLong(1)).toMap
  }

  test("single edge") {
    assert(cc(Seq(1L, 2L), Seq((1L, 2L))) == Map(1L -> 1L, 2L -> 1L))
  }

  test("isolated vertices are singleton components") {
    val got = cc(Seq(1L, 2L, 3L), Seq((1L, 2L)))
    assert(got(3L) == 3L)
    assert(got(1L) == got(2L))
  }

  test("path graph (worst case for plain propagation)") {
    val n = 120
    val got = cc((0 until n).map(_.toLong), (0 until n - 1).map(i => (i.toLong, i + 1L)))
    assert(got.values.toSet == Set(0L))
  }

  test("two components with distinct minima") {
    val got = cc(Seq(1L, 2L, 3L, 10L, 11L), Seq((1L, 2L), (2L, 3L), (10L, 11L)))
    assert(got(1L) == 1L && got(3L) == 1L)
    assert(got(10L) == 10L && got(11L) == 10L)
  }

  test("cycle graph") {
    val n = 30
    val edges = (0 until n).map(i => (i.toLong, ((i + 1) % n).toLong))
    val got = cc((0 until n).map(_.toLong), edges)
    assert(got.values.toSet == Set(0L))
  }

  test("matches union-find on random graphs") {
    for (seed <- 1 to 4) {
      val rng = new scala.util.Random(seed)
      val n = 50
      val edges = Vector.fill(40)((rng.nextInt(n).toLong, rng.nextInt(n).toLong))
        .filter { case (a, b) => a != b }
      val vertices = (0 until n).map(_.toLong)
      val got = cc(vertices, edges)
      val ref = TestUtil.naiveComponents(vertices, edges)
      assert(TestUtil.samePartition(got, ref), s"seed=$seed")
    }
  }

  test("roots are component minima") {
    val got = cc(Seq(5L, 9L, 7L), Seq((9L, 7L), (7L, 5L)))
    assert(got.values.toSet == Set(5L))
  }

  test("complete graph converges in few rounds") {
    val n = 20
    val edges = for (i <- 0 until n; j <- i + 1 until n) yield (i.toLong, j.toLong)
    val got = cc((0 until n).map(_.toLong), edges)
    assert(got.values.toSet == Set(0L))
  }
}
