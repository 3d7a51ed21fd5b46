package repro.exp

import org.apache.spark.sql.SparkSession
import repro.{SynthGraphs, SynthPoints}
import repro.graph.GraphOps

/** Table 1 experiment: vertex / edge / average-degree statistics of every
  * input graph used in this reproduction, mapped to the paper's datasets
  * (which are stand-ins at single-node scale — see DESIGN.md).
  */
object StatsExperiment {

  final case class Row(name: String, standsInFor: String, stats: GraphOps.Stats)

  def run(spark: SparkSession, rmatScales: Seq[Int] = Seq(10, 12, 14),
          webQueryN: Long = 60000L): Vector[Row] = {
    val rows = Vector.newBuilder[Row]
    for (s <- rmatScales) {
      val g = SynthGraphs.rmat(spark, s)
      rows += Row(s"rMAT-$s", "rMAT-28 family / OK / TW / FS / CW / HL",
                  GraphOps.stats(g))
    }
    rows += Row("web-query stand-in", "Web-Query (WQ)",
                GraphOps.stats(SynthGraphs.plantedGraph(spark, webQueryN)))
    for (spec <- SynthPoints.QualityDatasets) {
      val g = SynthPoints.knnGraph(spark, SynthPoints.dataset(spec))
      rows += Row(s"${spec.name} kNN(25)", s"UCI ${spec.name} kNN graph",
                  GraphOps.stats(g))
    }
    rows.result()
  }

  def format(rows: Seq[Row]): String = {
    val sb = new StringBuilder
    sb.append("| graph | stands in for | vertices | directed edges | avg deg |\n")
    sb.append("|---|---|---|---|---|\n")
    for (r <- rows)
      sb.append(f"| ${r.name} | ${r.standsInFor} | ${r.stats.numVertices} | ${r.stats.numDirectedEdges} | ${r.stats.avgDegree}%.1f |%n")
    sb.toString
  }
}
