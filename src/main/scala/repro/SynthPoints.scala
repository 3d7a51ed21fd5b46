package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import scala.util.Random

/** Labeled Gaussian-blob pointsets standing in for the UCI quality datasets
  * (iris / wine / digits / faces; §6.1), plus the k-NN similarity-graph
  * construction pipeline the paper uses: approximate NN → sim = 1/(1+dist)
  * → divide by the maximum similarity so the max is 1.
  *
  * Substitution (see DESIGN.md): UCI data is not available offline, so each
  * dataset is a deterministic blob mixture with the same (n, #classes) and
  * a class-overlap level calibrated so exact-HAC quality lands near the
  * paper's per-dataset ARI levels.
  */
object SynthPoints {

  final case class Point(id: Long, label: Long, vec: Array[Double])

  /** Deterministic Gaussian blobs.
    *
    * @param sep distance scale between class centers (per coordinate)
    * @param std within-class standard deviation
    */
  def blobs(n: Int, classes: Int, dim: Int, sep: Double, std: Double,
            seed: Long): Vector[Point] = {
    val rng = new Random(seed)
    val centers = Array.fill(classes, dim)(rng.nextGaussian() * sep)
    Vector.tabulate(n) { i =>
      val c = i % classes
      val v = Array.tabulate(dim)(j => centers(c)(j) + rng.nextGaussian() * std)
      Point(i.toLong, c.toLong, v)
    }
  }

  /** The four Table-2 stand-ins, keyed by the paper's dataset name. */
  final case class DatasetSpec(name: String, n: Int, classes: Int, dim: Int,
                               sep: Double, std: Double, seed: Long)
  val QualityDatasets: Vector[DatasetSpec] = Vector(
    // iris: 150 pts / 3 classes, two of them overlapping → high but not
    // perfect ARI
    DatasetSpec("iris",   150,  3,  4, sep = 2.2, std = 1.0, seed = 11),
    // wine: 178 / 3, heavy overlap → low ARI (~0.4 in the paper)
    DatasetSpec("wine",   178,  3, 13, sep = 0.55, std = 1.0, seed = 12),
    // digits: 1797 / 10, well separated → high ARI
    DatasetSpec("digits", 1797, 10, 16, sep = 2.0, std = 1.0, seed = 13),
    // faces: 400 / 40 tiny classes, moderate separation
    DatasetSpec("faces",  400, 40, 32, sep = 1.1, std = 1.0, seed = 14),
  )

  def dataset(spec: DatasetSpec): Vector[Point] =
    blobs(spec.n, spec.classes, spec.dim, spec.sep, spec.std, spec.seed)

  def euclid(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }

  /** Distributed k-NN similarity-graph construction (crossJoin + window
    * top-k; exact NN — fine at repro scale, stands in for the paper's ANN).
    * Output is symmetric (src, dst, w) with max weight 1.
    */
  def knnGraph(spark: SparkSession, pts: Seq[Point], k: Int = 25): DataFrame = {
    import spark.implicits._
    val df = spark.createDataFrame(pts.map(p => (p.id, p.vec.toSeq)))
      .toDF("id", "vec")
    val distUdf = udf((a: Seq[Double], b: Seq[Double]) =>
      euclid(a.toArray, b.toArray))
    val pairs = df.as("a").crossJoin(df.as("b"))
      .filter(col("a.id") =!= col("b.id"))
      .select(col("a.id").as("src"), col("b.id").as("dst"),
              distUdf(col("a.vec"), col("b.vec")).as("dist"))
    val win = Window.partitionBy("src").orderBy(col("dist").asc, col("dst").asc)
    val knn = pairs.withColumn("rn", row_number().over(win))
      .filter(col("rn") <= k)
      .select(col("src"), col("dst"), (lit(1.0) / (lit(1.0) + col("dist"))).as("w"))
    val sym = repro.graph.GraphOps.symmetrize(knn)
    val maxW = sym.agg(max("w")).collect()(0).getDouble(0)
    sym.select(col("src"), col("dst"), (col("w") / lit(maxW)).as("w"))
  }

  /** Local complete similarity graph over a pointset (one row per pair,
    * u < v), max-normalized — the Dasgupta-cost substrate and the input to
    * the exact O(n²) baselines.
    */
  def completeSimGraph(pts: Seq[Point]): Vector[(Long, Long, Double)] = {
    val arr = pts.toArray
    val out = Vector.newBuilder[(Long, Long, Double)]
    var maxSim = 0.0
    val sims = new Array[Double](arr.length * (arr.length - 1) / 2)
    var idx = 0
    var i = 0
    while (i < arr.length) {
      var j = i + 1
      while (j < arr.length) {
        val s = 1.0 / (1.0 + euclid(arr(i).vec, arr(j).vec))
        sims(idx) = s
        if (s > maxSim) maxSim = s
        idx += 1
        j += 1
      }
      i += 1
    }
    idx = 0
    i = 0
    while (i < arr.length) {
      var j = i + 1
      while (j < arr.length) {
        out += ((arr(i).id, arr(j).id, sims(idx) / maxSim))
        idx += 1
        j += 1
      }
      i += 1
    }
    out.result()
  }
}
