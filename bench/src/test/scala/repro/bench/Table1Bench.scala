package repro.bench

import repro.SparkSpec
import repro.exp.StatsExperiment

/** Regenerates Table 1 (graph input statistics). Scales are environment-
  * tunable: BENCH_RMAT_SCALES (csv, default "10,12,14"), BENCH_WQ_N.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: graph input statistics") {
    val scales = sys.env.get("BENCH_RMAT_SCALES")
      .map(_.split(',').map(_.trim.toInt).toSeq).getOrElse(Seq(10, 12, 14))
    val wqN = sys.env.get("BENCH_WQ_N").map(_.toLong).getOrElse(60000L)
    val rows = StatsExperiment.run(spark, scales, wqN)
    println("\n==== TABLE 1 (graph inputs) ====")
    println(StatsExperiment.format(rows))

    // shape assertions: rMAT family keeps a ~real-world average degree and
    // grows with scale; every graph is non-trivial
    val rmats = rows.filter(_.name.startsWith("rMAT"))
    assert(rmats.map(_.stats.numVertices) == rmats.map(_.stats.numVertices).sorted)
    for (r <- rows) {
      assert(r.stats.numVertices > 0 && r.stats.numDirectedEdges > 0)
      assert(r.stats.avgDegree > 1.0, s"${r.name} is too sparse")
    }
    // the web-query stand-in keeps the paper's "avg degree in the hundreds
    // scaled down" flavour: denser than 2, sparser than 100
    val wq = rows.find(_.name.startsWith("web-query")).get
    assert(wq.stats.avgDegree > 2 && wq.stats.avgDegree < 100)
  }
}
