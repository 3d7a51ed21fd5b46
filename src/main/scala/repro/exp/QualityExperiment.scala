package repro.exp

import org.apache.spark.sql.SparkSession
import repro.{SynthGraphs, SynthPoints}
import repro.SynthPoints.DatasetSpec
import repro.baselines.{ExactHAC, GraphDBSCAN, SCC}
import repro.core.{Dendrogram, TeraHAC}
import repro.quality.Metrics

/** Table 2 experiment: ARI / NMI / Dendrogram Purity / Dasgupta cost of
  * TeraHAC (ε ∈ {0, 0.1} × t ∈ {0, 0.01}) vs SCC-5/25/100, the exact
  * average-linkage baseline over the complete similarity graph ("Sci-Avg"),
  * and DBSCAN with a parameter grid search — on the four labeled quality
  * datasets, using k-NN similarity graphs with k = 25.
  *
  * Methodology mirrors the paper: SCC is scored by its best level; DBSCAN
  * by its best grid point; HAC dendrograms are flattened over a threshold
  * sweep and scored by the best flat clustering (the paper's single
  * reported flat score per dendrogram is likewise threshold-tuned).
  * Purity and Dasgupta are dendrogram-level (blank for SCC/DBSCAN, exactly
  * as in the paper's table).
  */
object QualityExperiment {

  final case class Scores(ari: Double, nmi: Double,
                          purity: Option[Double], dasgupta: Option[Double])
  final case class DatasetResult(dataset: String, rows: Vector[(String, Scores)])

  /** Flatten-threshold sweep grid (≥ 0.01 so pruned runs are valid per
    * Lemma 9). Denser than SCC-100's level schedule so the paper's
    * best-flat-clustering methodology treats both sides equally.
    */
  val ThresholdGrid: Vector[Double] =
    (0 until 160).map(i => 0.01 * math.pow(100.0, i / 159.0)).toVector // 0.01..1.0

  def bestFlat(d: Dendrogram, labels: Map[Long, Long]): (Double, Double) = {
    var bestAri = Double.NegativeInfinity
    var bestNmi = Double.NegativeInfinity
    for (t <- ThresholdGrid) {
      val flat = d.flatten(t)
      bestAri = math.max(bestAri, Metrics.ari(flat, labels))
      bestNmi = math.max(bestNmi, Metrics.nmi(flat, labels))
    }
    (bestAri, bestNmi)
  }

  def evalDendrogram(d: Dendrogram, labels: Map[Long, Long],
                     completeSim: Vector[(Long, Long, Double)]): Scores = {
    val (a, n) = bestFlat(d, labels)
    Scores(a, n, Some(Metrics.dendrogramPurity(d, labels)),
           Some(Metrics.dasguptaCost(d, completeSim)))
  }

  def evalLevels(levels: Seq[Map[Long, Long]], labels: Map[Long, Long]): Scores = {
    var bestAri = Double.NegativeInfinity
    var bestNmi = Double.NegativeInfinity
    for (lv <- levels) {
      bestAri = math.max(bestAri, Metrics.ari(lv, labels))
      bestNmi = math.max(bestNmi, Metrics.nmi(lv, labels))
    }
    Scores(bestAri, bestNmi, None, None)
  }

  val DbscanEpsGrid: Vector[Double] =
    Vector(0.5, 0.6, 0.7, 0.75, 0.8, 0.85, 0.9, 0.93, 0.95, 0.97, 0.99)
  val DbscanMinPtsGrid: Vector[Int] = Vector(2, 4, 8, 16, 32, 64, 128)

  def runDataset(spark: SparkSession, spec: DatasetSpec, k: Int = 25): DatasetResult = {
    val pts = SynthPoints.dataset(spec)
    val labels: Map[Long, Long] = pts.map(p => p.id -> p.label).toMap
    val knn = SynthPoints.knnGraph(spark, pts, k).persist()
    knn.count()
    val knnLocal = SynthGraphs.collectUndirected(knn)
    val complete = SynthPoints.completeSimGraph(pts)

    val rows = Vector.newBuilder[(String, Scores)]

    for ((eps, t) <- Vector((0.0, 0.0), (0.0, 0.01), (0.1, 0.0), (0.1, 0.01))) {
      val res = TeraHAC.run(spark, knn, eps, t,
        maxClusterEdges = math.max(2048L, knnLocal.size / 4L))
      val d = res.toLocal
      rows += (s"TeraHAC e=$eps t=$t" -> evalDendrogram(d, labels, complete))
    }

    for (r <- Vector(5, 25, 100)) {
      val levels = SCC.runLocal(knnLocal, r, t = 0.01)
      rows += (s"SCC-$r" -> evalLevels(levels, labels))
    }

    val sciAvg = ExactHAC.dendrogram(complete)
    rows += ("Sci-Avg" -> evalDendrogram(sciAvg, labels, complete))

    var bestAri = Double.NegativeInfinity
    var bestNmi = Double.NegativeInfinity
    for (e <- DbscanEpsGrid; mp <- DbscanMinPtsGrid) {
      val cl = GraphDBSCAN.runLocal(complete, e, mp)
      bestAri = math.max(bestAri, Metrics.ari(cl, labels))
      bestNmi = math.max(bestNmi, Metrics.nmi(cl, labels))
    }
    rows += ("DBSCAN" -> Scores(bestAri, bestNmi, None, None))

    knn.unpersist()
    DatasetResult(spec.name, rows.result())
  }

  def run(spark: SparkSession,
          specs: Seq[DatasetSpec] = SynthPoints.QualityDatasets): Vector[DatasetResult] =
    specs.map(runDataset(spark, _)).toVector

  def format(results: Seq[DatasetResult]): String = {
    val sb = new StringBuilder
    for (r <- results) {
      sb.append(s"\n### dataset: ${r.dataset}\n")
      sb.append(f"| algorithm | ARI | NMI | Purity | Dasgupta |%n")
      sb.append(s"|---|---|---|---|---|\n")
      for ((name, s) <- r.rows) {
        val p = s.purity.map(v => f"$v%.3f").getOrElse("-")
        val d = s.dasgupta.map(v => f"$v%.1f").getOrElse("-")
        sb.append(f"| $name | ${s.ari}%.3f | ${s.nmi}%.3f | $p | $d |%n")
      }
    }
    sb.toString
  }
}
