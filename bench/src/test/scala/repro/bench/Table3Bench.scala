package repro.bench

import repro.SparkSpec
import repro.exp.WebQueryExperiment

/** Regenerates Table 3 (median running times on the Web-Query stand-in)
  * plus the Fig. 13 precision/recall companion. BENCH_WQ_N and BENCH_RUNS
  * tune the scale (defaults: 60k vertices, 3 runs).
  */
class Table3Bench extends SparkSpec {

  test("Table 3: median running times + PR on the web-query stand-in") {
    val n = sys.env.get("BENCH_WQ_N").map(_.toLong).getOrElse(60000L)
    val runs = sys.env.get("BENCH_RUNS").map(_.toInt).getOrElse(3)
    val res = WebQueryExperiment.run(spark, n, runs = runs)
    println("\n==== TABLE 3 (web-query timings) ====")
    println(WebQueryExperiment.format(res))

    val t = res.timings.map(x => x.name -> x.medianMs).toMap
    val tera = t("TeraHAC(e=0.1,t=0.05)")
    // paper's shape: SCC-5 < TeraHAC < SCC-50 (TeraHAC ~2x faster than
    // SCC-50, ~2x slower than SCC-5); DBSCAN fastest of all
    assert(tera < t("SCC-50"), s"TeraHAC ($tera ms) not faster than SCC-50")
    assert(t("DBSCAN") < t("SCC-50"), "DBSCAN not faster than SCC-50")

    // quality shape: at comparable precision TeraHAC reaches the highest
    // recall; DBSCAN recall is far lower (paper: >2x lower)
    val teraBest = res.pr.filter(_.name.startsWith("TeraHAC"))
      .filter(_.precision >= 0.9).map(_.recall).maxOption.getOrElse(0.0)
    val sccBest = res.pr.filter(_.name.startsWith("SCC"))
      .filter(_.precision >= 0.9).map(_.recall).maxOption.getOrElse(0.0)
    val dbscan = res.pr.filter(_.name.startsWith("DBSCAN"))
      .map(_.recall).maxOption.getOrElse(0.0)
    println(f"recall@p>=0.9: TeraHAC=$teraBest%.3f SCC=$sccBest%.3f DBSCAN(any p)=$dbscan%.3f")
    assert(teraBest >= sccBest - 1e-9,
      f"TeraHAC recall $teraBest%.3f below SCC $sccBest%.3f at precision ≥ 0.9")
  }
}
