package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.GraphOps

/** Synthetic graph generators for the scalability / timing experiments.
  *
  *  - rMAT with the paper's parameters (a=0.6, b=c=0.15, d=0.1, edge
  *    factor 50) and the paper's 1/log(deg(u)+deg(v)) similarity weighting
  *    for unweighted graphs;
  *  - a planted-partition similarity graph standing in for the 8T-edge
  *    Web-Query graph of §6.3, with sampled human-label-style intent pairs.
  */
object SynthGraphs {

  /** rMAT-`scale`: 2^scale vertices, edgeFactor·2^scale undirected edges
    * before dedup (paper §6). Returns a symmetric, degree-weighted graph.
    */
  def rmat(spark: SparkSession, scale: Int, edgeFactor: Int = 50,
           seed: Long = 7, a: Double = 0.6, b: Double = 0.15,
           c: Double = 0.15): DataFrame = {
    require(scale <= 30, "keep within the single-node repro envelope")
    val e = (edgeFactor.toLong << scale)
    var df = spark.range(e).select(lit(0L).as("src"), lit(0L).as("dst"))
    for (i <- 0 until scale) {
      val r = rand(seed + 101L * i + 13L)
      val srcBit = when(r >= a + b, 1L).otherwise(0L)
      val dstBit = when((r >= a && r < a + b) || r >= a + b + c, 1L).otherwise(0L)
      df = df.select((col("src") + srcBit * (1L << i)).as("src"),
                     (col("dst") + dstBit * (1L << i)).as("dst"))
    }
    GraphOps.degreeWeights(GraphOps.symmetrize(df))
  }

  /** Planted-partition similarity graph (Web-Query stand-in).
    *
    * `n` vertices in contiguous ground-truth intent clusters of size
    * `clusterSize`; `intraDeg` intra-cluster edge draws per vertex with
    * similarities in [simIntraLo, 1], `interDeg` inter-cluster draws with
    * similarities in [simInterLo, simInterHi].
    */
  def plantedGraph(spark: SparkSession, n: Long, clusterSize: Int = 8,
                   intraDeg: Int = 6, interDeg: Int = 4,
                   simIntraLo: Double = 0.80, simInterLo: Double = 0.20,
                   simInterHi: Double = 0.90, seed: Long = 21): DataFrame = {
    val nClusters = n / clusterSize
    val intra = spark.range(n * intraDeg).select(
      (col("id") % n).as("src"),
      rand(seed).as("r1"), rand(seed + 1).as("r2"))
      .select(col("src"),
        ((col("src") - pmod(col("src"), lit(clusterSize.toLong))) +
          (col("r1") * clusterSize).cast("long")).as("dst"),
        (lit(simIntraLo) + col("r2") * (1.0 - simIntraLo)).as("w"))
    val inter = spark.range(n * interDeg).select(
      (rand(seed + 2) * n).cast("long").as("src"),
      (rand(seed + 3) * n).cast("long").as("dst"),
      (lit(simInterLo) + rand(seed + 4) * (simInterHi - simInterLo)).as("w"))
    GraphOps.symmetrize(intra.union(inter)
      .filter(col("src") =!= col("dst"))
      .filter(col("src") >= 0 && col("src") < n && col("dst") >= 0 && col("dst") < n))
  }

  /** Ground-truth intent label of a planted-graph vertex. */
  def plantedLabel(clusterSize: Int)(v: Long): Long = v / clusterSize

  /** Deterministic labeled query pairs for the §6.3 evaluation: ~`posFrac`
    * of the pairs share an intent cluster (the paper's sample is 13%
    * positive).
    */
  def labeledPairs(n: Long, clusterSize: Int, count: Int, posFrac: Double = 0.13,
                   seed: Long = 33): Vector[(Long, Long, Boolean)] = {
    val rng = new scala.util.Random(seed)
    Vector.fill(count) {
      if (rng.nextDouble() < posFrac) {
        val base = (math.abs(rng.nextLong()) % (n - clusterSize)) / clusterSize * clusterSize
        val a = base + rng.nextInt(clusterSize)
        var b = base + rng.nextInt(clusterSize)
        while (b == a) b = base + rng.nextInt(clusterSize)
        (a, b, true)
      } else {
        var a = math.abs(rng.nextLong()) % n
        var b = math.abs(rng.nextLong()) % n
        while (a / clusterSize == b / clusterSize) {
          a = math.abs(rng.nextLong()) % n
          b = math.abs(rng.nextLong()) % n
        }
        (a, b, false)
      }
    }
  }

  /** Collects a (small) symmetric edge frame to a local undirected list. */
  def collectUndirected(edges: DataFrame): Vector[(Long, Long, Double)] =
    edges.filter(col("src") < col("dst")).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getDouble(2))).toVector
}
