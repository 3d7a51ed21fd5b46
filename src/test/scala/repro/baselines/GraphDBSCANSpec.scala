package repro.baselines

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestUtil}
import repro.quality.Metrics

class GraphDBSCANSpec extends SparkSpec {

  private def sym(edges: Seq[(Long, Long, Double)]) = {
    import spark.implicits._
    repro.graph.GraphOps.symmetrize(edges.toDF("src", "dst", "w"))
  }

  private def clique(base: Long, k: Int, w: Double): Seq[(Long, Long, Double)] =
    for (i <- 0 until k; j <- i + 1 until k) yield (base + i, base + j, w)

  test("local: two dense cliques with a weak bridge form two clusters") {
    val edges = clique(0L, 4, 0.9) ++ clique(10L, 4, 0.9) :+ ((0L, 10L, 0.3))
    val got = GraphDBSCAN.runLocal(edges, epsSim = 0.8, minPts = 3)
    assert(got(0L) == got(3L))
    assert(got(10L) == got(13L))
    assert(got(0L) != got(10L))
  }

  test("local: border vertex attaches to its most similar core neighbor") {
    val edges = clique(0L, 4, 0.9) ++ clique(10L, 4, 0.9) ++
      Seq((99L, 0L, 0.85), (99L, 10L, 0.83))
    val got = GraphDBSCAN.runLocal(edges, epsSim = 0.8, minPts = 3)
    assert(got(99L) == got(0L)) // 0.85 > 0.83
  }

  test("local: vertices with no core neighbor at ε become singletons") {
    val edges = clique(0L, 4, 0.9) :+ ((99L, 0L, 0.5))
    val got = GraphDBSCAN.runLocal(edges, epsSim = 0.8, minPts = 3)
    assert(got(99L) == 99L)
  }

  test("local: minPts gates core status") {
    // path: nobody has 2 heavy neighbors except the middle
    val edges = Seq((0L, 1L, 0.9), (1L, 2L, 0.9))
    val loose = GraphDBSCAN.runLocal(edges, 0.8, minPts = 1)
    assert(loose.values.toSet.size == 1)
    val strict = GraphDBSCAN.runLocal(edges, 0.8, minPts = 3)
    // no cores at all: everyone is a singleton
    assert(strict == Map(0L -> 0L, 1L -> 1L, 2L -> 2L))
  }

  test("distributed matches local on random graphs (ARI = 1)") {
    for (seed <- 1 to 3) {
      val edges = TestUtil.randomConnectedGraph(40, 120, seed)
      val local = GraphDBSCAN.runLocal(edges, epsSim = 0.6, minPts = 3)
      val dist = GraphDBSCAN.runDistributed(spark, sym(edges), 0.6, 3)
        .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
      assert(dist.keySet == local.keySet, s"seed=$seed coverage")
      assert(Metrics.ari(dist, local) == 1.0, s"seed=$seed")
    }
  }

  test("distributed covers every vertex exactly once") {
    val edges = TestUtil.randomConnectedGraph(30, 60, seed = 4)
    val out = GraphDBSCAN.runDistributed(spark, sym(edges), 0.7, 2)
    assert(out.count() == 30)
    assert(out.select("id").distinct().count() == 30)
  }

  test("oracle: core-vertex counting matches SQL") {
    import spark.implicits._
    val edges = TestUtil.randomConnectedGraph(25, 60, seed = 5)
    val e = sym(edges)
    val eps = 0.5
    val core = e.filter(col("w") >= eps)
      .groupBy(col("src").as("id")).agg(count("*").as("cnt"))
      .filter(col("cnt") >= 3).select("id", "cnt")
    Oracle.assertEquivalent(
      core,
      """SELECT CAST(src AS BIGINT) AS id, COUNT(*) AS cnt FROM edges
        |WHERE CAST(w AS DOUBLE) >= 0.5 GROUP BY src HAVING COUNT(*) >= 3"""
        .stripMargin,
      "edges" -> e)
  }

  test("raising ε can only shrink core clusters") {
    val edges = TestUtil.randomConnectedGraph(40, 150, seed = 6)
    val lo = GraphDBSCAN.runLocal(edges, 0.4, 3)
    val hi = GraphDBSCAN.runLocal(edges, 0.8, 3)
    val loClusters = TestUtil.toPartition(lo).values.count(_.size > 1)
    val hiNonSingleton = hi.groupBy(_._2).count(_._2.size > 1)
    // weaker structural claim: number of non-singleton vertices shrinks
    val loNon = lo.groupBy(_._2).filter(_._2.size > 1).values.map(_.size).sum
    val hiNon = hi.groupBy(_._2).filter(_._2.size > 1).values.map(_.size).sum
    assert(hiNon <= loNon, s"$hiNon > $loNon")
    assert(loClusters >= 0 && hiNonSingleton >= 0)
  }

  test("perfect recovery on planted cliques (quality sanity)") {
    val edges = clique(0L, 6, 0.95) ++ clique(10L, 6, 0.95) ++ clique(20L, 6, 0.95) ++
      Seq((0L, 10L, 0.2), (10L, 20L, 0.25))
    val labels = edges.flatMap(e => Seq(e._1, e._2)).distinct
      .map(v => v -> v / 10L).toMap
    val got = GraphDBSCAN.runLocal(edges, 0.9, 3)
    assert(Metrics.ari(got, labels) == 1.0)
  }
}
