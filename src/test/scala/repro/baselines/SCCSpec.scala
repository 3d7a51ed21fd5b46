package repro.baselines

import repro.{SparkSpec, TestUtil}
import repro.quality.Metrics

class SCCSpec extends SparkSpec {

  private def sym(edges: Seq[(Long, Long, Double)]) = {
    import spark.implicits._
    repro.graph.GraphOps.symmetrize(edges.toDF("src", "dst", "w"))
  }

  test("threshold schedule is geometric from wmax down to t") {
    val s = SCC.schedule(1.0, 0.01, 4)
    assert(s.size == 4)
    assert(math.abs(s.last - 0.01) < 1e-12)
    // constant ratio between consecutive thresholds
    val ratios = s.sliding(2).map { case Vector(a, b) => b / a }.toVector
    assert(ratios.forall(r => math.abs(r - ratios.head) < 1e-9))
  }

  test("schedule with r=1 jumps straight to t") {
    assert(SCC.schedule(1.0, 0.05, 1) == Vector(0.05))
  }

  test("local: levels are coarsenings of previous levels") {
    val edges = TestUtil.randomConnectedGraph(30, 60, seed = 1)
    val levels = SCC.runLocal(edges, rounds = 6, t = 0.05)
    for (Vector(a, b) <- levels.sliding(2)) {
      // if two vertices share a cluster at level i they share it at i+1
      val byCluster = a.groupBy(_._2).values
      for (group <- byCluster) {
        val next = group.keys.map(b).toSet
        assert(next.size == 1, "level did not coarsen")
      }
    }
  }

  test("local: first level only joins pairs above the first threshold") {
    val edges = Seq((0L, 1L, 1.0), (1L, 2L, 0.2), (3L, 4L, 0.95))
    val levels = SCC.runLocal(edges, rounds = 3, t = 0.1)
    val l1 = levels.head
    assert(l1(0L) == l1(1L)) // weight 1.0 ≥ τ₁
    assert(l1(2L) != l1(0L)) // 0.2 below τ₁
  }

  test("local: final level merges everything above t on a tight clique") {
    val edges = Seq((0L, 1L, 0.9), (1L, 2L, 0.9), (0L, 2L, 0.9))
    val levels = SCC.runLocal(edges, rounds = 3, t = 0.1)
    assert(levels.last.values.toSet.size == 1)
  }

  test("local: clusters never span components") {
    val c1 = TestUtil.randomConnectedGraph(10, 10, seed = 2)
    val c2 = TestUtil.randomConnectedGraph(10, 10, seed = 3)
      .map { case (u, v, w) => (u + 50L, v + 50L, w) }
    val levels = SCC.runLocal(c1 ++ c2, rounds = 5, t = 0.01)
    for (lv <- levels; (a, ca) <- lv; (b, cb) <- lv if ca == cb)
      assert((a < 50L) == (b < 50L))
  }

  test("distributed matches local on random graphs (per-level ARI = 1)") {
    for (seed <- 1 to 3) {
      val edges = TestUtil.randomConnectedGraph(30, 50, seed)
      val local = SCC.runLocal(edges, rounds = 5, t = 0.05)
      val dist = SCC.runDistributed(spark, sym(edges), rounds = 5, t = 0.05)
      assert(dist.levels.size == local.size)
      for ((df, lv) <- dist.levels.zip(local)) {
        val got = df.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
        assert(got.keySet == lv.keySet, s"seed=$seed coverage")
        assert(Metrics.ari(got, lv) == 1.0, s"seed=$seed level differs")
      }
    }
  }

  test("distributed: level frames cover every original vertex") {
    val edges = TestUtil.randomConnectedGraph(25, 40, seed = 5)
    val dist = SCC.runDistributed(spark, sym(edges), rounds = 3, t = 0.05)
    for (df <- dist.levels)
      assert(df.select("id").distinct().count() == 25)
  }

  test("more rounds refine the hierarchy (levels distinct on skewed weights)") {
    // weights spread over two orders of magnitude
    val rng = new scala.util.Random(9)
    val edges = (0 until 40).map { i =>
      (i.toLong, (i + 1).toLong, math.pow(10.0, -2.0 * rng.nextDouble()))
    }
    val levels = SCC.runLocal(edges, rounds = 8, t = 0.01)
    val partitions = levels.map(lv => TestUtil.toPartition(lv).values.toSet)
    assert(partitions.distinct.size >= 3, "hierarchy collapsed to too few levels")
  }

  test("SCC flat quality is below exact HAC on overlap-free data (sanity)") {
    // well-separated three cliques: both should get them right
    def clique(base: Long, w: Double) =
      for (i <- 0 until 4; j <- i + 1 until 4)
        yield (base + i, base + j, w)
    val edges = clique(0L, 0.9) ++ clique(10L, 0.9) ++ clique(20L, 0.9) ++
      Seq((0L, 10L, 0.05), (10L, 20L, 0.05))
    val labels = edges.flatMap(e => Seq(e._1, e._2)).distinct
      .map(v => v -> v / 10L).toMap
    val levels = SCC.runLocal(edges, rounds = 5, t = 0.01)
    val best = levels.map(lv => Metrics.ari(lv, labels)).max
    assert(best == 1.0)
  }
}
