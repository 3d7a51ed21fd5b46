package repro.bench

import repro.SparkSpec
import repro.SynthPoints
import repro.exp.QualityExperiment

/** Regenerates Table 2 (quality grid). BENCH_DATASETS (csv of names)
  * restricts the datasets; default runs all four.
  */
class Table2Bench extends SparkSpec {

  test("Table 2: quality of TeraHAC vs SCC vs exact HAC vs DBSCAN") {
    val wanted = sys.env.get("BENCH_DATASETS").map(_.split(',').map(_.trim).toSet)
    val specs = SynthPoints.QualityDatasets
      .filter(s => wanted.forall(_.contains(s.name)))
    val results = QualityExperiment.run(spark, specs)
    println("\n==== TABLE 2 (quality) ====")
    println(QualityExperiment.format(results))

    for (r <- results) {
      val m = r.rows.toMap
      val tera = m("TeraHAC e=0.1 t=0.01")
      val exact = m("TeraHAC e=0.0 t=0.0")
      val sci = m("Sci-Avg")
      // paper's key quality claims, as shape assertions:
      // (1) approximate + thresholded TeraHAC stays within a few percent of
      //     exact graph HAC
      assert(tera.ari >= exact.ari - 0.10, s"${r.dataset}: ARI degraded")
      assert(tera.nmi >= exact.nmi - 0.10, s"${r.dataset}: NMI degraded")
      // (2) all HAC variants produce sane scores
      for ((name, s) <- r.rows) {
        assert(s.ari >= -0.5 && s.ari <= 1.0, s"${r.dataset}/$name ARI=${s.ari}")
        assert(s.nmi >= 0.0 && s.nmi <= 1.0 + 1e-9, s"${r.dataset}/$name NMI")
      }
      // (3) graph-HAC is competitive with the O(n²) exact baseline
      assert(exact.ari >= sci.ari - 0.15, s"${r.dataset}: graph HAC far below Sci-Avg")
      assert(sci.purity.isDefined && sci.dasgupta.isDefined)
    }
    // (4) averaged over datasets, TeraHAC(0.1, 0.01) is competitive with
    //     every fixed SCC setting (the paper's 1.16x-quality headline,
    //     directionally). On our synthetic blob geometry SCC-100's
    //     100-level sweep is stronger than on the paper's real datasets,
    //     so the pointwise-best-SCC comparison gets a 0.10 tolerance; see
    //     EXPERIMENTS.md.
    def avg(name: String) =
      results.map(_.rows.toMap.apply(name).ari).sum / results.size
    val teraAvg = avg("TeraHAC e=0.1 t=0.01")
    val scc5 = avg("SCC-5"); val scc25 = avg("SCC-25"); val scc100 = avg("SCC-100")
    val sccBestAvg = results.map { r =>
      Seq("SCC-5", "SCC-25", "SCC-100").map(r.rows.toMap.apply(_).ari).max
    }.sum / results.size
    println(f"TeraHAC avg ARI = $teraAvg%.3f; SCC-5/25/100 avg = " +
      f"$scc5%.3f/$scc25%.3f/$scc100%.3f; pointwise-best SCC = $sccBestAvg%.3f")
    assert(teraAvg >= scc5 - 0.02 && teraAvg >= scc25 - 0.02,
      f"TeraHAC avg $teraAvg%.3f below SCC-5 $scc5%.3f or SCC-25 $scc25%.3f")
    assert(teraAvg >= sccBestAvg - 0.10,
      f"TeraHAC avg ARI $teraAvg%.3f far below pointwise-best SCC $sccBestAvg%.3f")
  }
}
