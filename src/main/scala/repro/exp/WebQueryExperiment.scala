package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthGraphs
import repro.baselines.{GraphDBSCAN, SCC}
import repro.core.TeraHAC
import repro.quality.Metrics

/** Table 3 / §6.3 experiment on the Web-Query stand-in graph: median
  * running times of TeraHAC(ε=0.1, t=0.05), SCC-50, SCC-5 and distributed
  * graph DBSCAN, plus precision/recall on sampled labeled intent pairs
  * (the Fig. 13 companion — the paper's table reports the times, the PR
  * points validate the quality ordering).
  */
object WebQueryExperiment {

  final case class Timing(name: String, medianMs: Long, runsMs: Vector[Long])
  final case class PR(name: String, precision: Double, recall: Double)
  final case class Result(n: Long, directedEdges: Long, timings: Vector[Timing],
                          pr: Vector[PR])

  private def timeMs[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1000000L)
  }

  private def median(xs: Vector[Long]): Long = {
    val s = xs.sorted
    s(s.size / 2)
  }

  def run(spark: SparkSession, n: Long = 60000L, clusterSize: Int = 8,
          runs: Int = 3, numPairs: Int = 4000): Result = {
    val g = SynthGraphs.plantedGraph(spark, n, clusterSize).persist()
    val m = g.count()
    val pairs = SynthGraphs.labeledPairs(n, clusterSize, numPairs)
    val t = 0.05

    def collectClusters(df: DataFrame): Map[Long, Long] =
      df.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap

    // --- TeraHAC
    var teraFlat: Map[Double, Map[Long, Long]] = Map.empty
    val teraTimes = (1 to runs).map { _ =>
      val (res, ms) = timeMs(TeraHAC.run(spark, g, eps = 0.1, t = t,
        maxClusterEdges = 1L << 18))
      val d = res.toLocal
      teraFlat = Vector(0.9, 0.8, 0.7, 0.6, 0.5, 0.4, 0.3, 0.2, 0.1, t)
        .map(th => th -> d.flatten(th)).toMap
      ms
    }.toVector

    // --- SCC-50 / SCC-5 (distributed)
    var scc50PR: Vector[PR] = Vector.empty
    val scc50Times = (1 to runs).map { _ =>
      val (res, ms) = timeMs(SCC.runDistributed(spark, g, rounds = 50, t = t))
      scc50PR = res.levels.zipWithIndex.collect {
        case (lv, i) if (i + 1) % 10 == 0 =>
          val (p, r) = Metrics.precisionRecall(collectClusters(lv), pairs)
          PR(s"SCC-50 level ${i + 1}", p, r)
      }
      ms
    }.toVector
    var scc5PR: Vector[PR] = Vector.empty
    val scc5Times = (1 to runs).map { _ =>
      val (res, ms) = timeMs(SCC.runDistributed(spark, g, rounds = 5, t = t))
      scc5PR = res.levels.zipWithIndex.map { case (lv, i) =>
        val (p, r) = Metrics.precisionRecall(collectClusters(lv), pairs)
        PR(s"SCC-5 level ${i + 1}", p, r)
      }
      ms
    }.toVector

    // --- DBSCAN (distributed)
    var dbscanPR: Vector[PR] = Vector.empty
    val dbscanTimes = (1 to runs).map { _ =>
      val (cl, ms) = timeMs {
        val out = GraphDBSCAN.runDistributed(spark, g, epsSim = 0.9, minPts = 4)
        out.count(); out
      }
      val (p, r) = Metrics.precisionRecall(collectClusters(cl), pairs)
      dbscanPR = Vector(PR("DBSCAN(0.9,4)", p, r))
      ms
    }.toVector

    val teraPR = teraFlat.toVector.sortBy(-_._1).map { case (th, fl) =>
      val (p, r) = Metrics.precisionRecall(fl, pairs)
      PR(f"TeraHAC flat@$th%.2f", p, r)
    }

    g.unpersist()
    Result(n, m,
      Vector(
        Timing("TeraHAC(e=0.1,t=0.05)", median(teraTimes), teraTimes),
        Timing("SCC-50", median(scc50Times), scc50Times),
        Timing("SCC-5", median(scc5Times), scc5Times),
        Timing("DBSCAN", median(dbscanTimes), dbscanTimes)),
      teraPR ++ scc50PR ++ scc5PR ++ dbscanPR)
  }

  def format(r: Result): String = {
    val sb = new StringBuilder
    sb.append(s"\nweb-query stand-in: n=${r.n}, directed edges=${r.directedEdges}\n")
    sb.append("| algorithm | median s | runs s |\n|---|---|---|\n")
    for (t <- r.timings)
      sb.append(f"| ${t.name} | ${t.medianMs / 1000.0}%.1f | ${t.runsMs.map(x => f"${x / 1000.0}%.1f").mkString(", ")} |%n")
    sb.append("\n| clustering | precision | recall |\n|---|---|---|\n")
    for (p <- r.pr)
      sb.append(f"| ${p.name} | ${p.precision}%.3f | ${p.recall}%.3f |%n")
    sb.toString
  }
}
