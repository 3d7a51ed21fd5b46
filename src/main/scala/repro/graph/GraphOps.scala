package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Relational building blocks of the distributed graph dataflow.
  *
  * Canonical schema: edges are `(src: Long, dst: Long, w: Double)` with BOTH
  * directions stored (symmetric), no self loops, positive weights; sizes are
  * `(id: Long, size: Long)`.
  */
object GraphOps {

  /** Graph statistics: vertices, directed edge rows, average degree. */
  final case class Stats(numVertices: Long, numDirectedEdges: Long, avgDegree: Double)

  def stats(edges: DataFrame): Stats = {
    val n = edges.select("src").distinct().count()
    val m = edges.count()
    Stats(n, m, if (n == 0) 0.0 else m.toDouble / n)
  }

  /** Makes an arbitrary (src, dst) pair list a canonical undirected graph:
    * drops self loops, dedupes (keeping max weight), adds both directions.
    */
  def symmetrize(pairs: DataFrame): DataFrame = {
    val withW =
      if (pairs.columns.contains("w")) pairs.select("src", "dst", "w")
      else pairs.select(col("src"), col("dst"), lit(1.0).as("w"))
    val canon = withW
      .filter(col("src") =!= col("dst"))
      .select(least(col("src"), col("dst")).as("src"),
              greatest(col("src"), col("dst")).as("dst"),
              col("w"))
      .groupBy("src", "dst").agg(max("w").as("w"))
    canon.union(canon.select(col("dst").as("src"), col("src").as("dst"), col("w")))
  }

  /** The paper's weighting for unweighted graphs (§6): for a symmetric edge
    * set, set `w(u,v) = 1 / ln(deg(u) + deg(v))`, which favours merging
    * low-degree vertices.
    */
  def degreeWeights(symEdges: DataFrame): DataFrame = {
    val deg = symEdges.groupBy("src").agg(count("*").as("deg"))
    symEdges
      .join(deg.withColumnRenamed("src", "src").withColumnRenamed("deg", "degS"), "src")
      .join(deg.select(col("src").as("dst"), col("deg").as("degD")), "dst")
      .select(col("src"), col("dst"),
              (lit(1.0) / log(col("degS") + col("degD"))).as("w"))
  }

  /** Number of directed edge rows with weight ≥ t (paper's
    * NumberOfHeavyEdges).
    */
  def heavyCount(edges: DataFrame, t: Double): Long =
    edges.filter(col("w") >= t).count()

  /** Per-vertex maximum incident weight: (id, wmax). */
  def wmaxPerVertex(edges: DataFrame): DataFrame =
    edges.groupBy(col("src").as("id")).agg(max("w").as("wmax"))

  /** Contracts the graph by a total assignment (id → cid).
    *
    * Average-linkage aware: raw cross weight `Σ w·|u|·|v|` is aggregated per
    * cluster pair and renormalized by the product of new cluster sizes.
    * Self loops (intra-cluster edges) vanish. Returns (edges', sizes').
    *
    * @param newSizes optional precomputed sizes of the new clusters (e.g.
    *                 SubgraphHAC metadata); derived from `sizes`+`assign`
    *                 when absent.
    */
  def contract(edges: DataFrame, sizes: DataFrame, assign: DataFrame,
               newSizes: Option[DataFrame] = None): (DataFrame, DataFrame) = {
    val ns = newSizes.getOrElse(
      sizes.join(assign, "id").groupBy(col("cid").as("id")).agg(sum("size").as("size")))
    val raw = edges
      .join(sizes.select(col("id").as("src"), col("size").as("srcSize")), "src")
      .join(sizes.select(col("id").as("dst"), col("size").as("dstSize")), "dst")
      .join(assign.select(col("id").as("src"), col("cid").as("nsrc")), "src")
      .join(assign.select(col("id").as("dst"), col("cid").as("ndst")), "dst")
      .filter(col("nsrc") =!= col("ndst"))
      .groupBy("nsrc", "ndst")
      .agg(sum(col("w") * col("srcSize") * col("dstSize")).as("raw"))
    val newEdges = raw
      .join(ns.select(col("id").as("nsrc"), col("size").as("sA")), "nsrc")
      .join(ns.select(col("id").as("ndst"), col("size").as("sB")), "ndst")
      .select(col("nsrc").as("src"), col("ndst").as("dst"),
              (col("raw") / (col("sA") * col("sB"))).as("w"))
    (newEdges, ns)
  }

  /** Vertex pruning (Alg. 1 line 7): drop vertices whose max incident
    * weight is < thr, together with all their edges. Returns (edges',
    * surviving vertex frame filtered by `vertices`' id column).
    */
  def prune(edges: DataFrame, vertices: DataFrame, thr: Double): (DataFrame, DataFrame) = {
    val keep = wmaxPerVertex(edges).filter(col("wmax") >= thr).select("id")
    val e = edges
      .join(keep.select(col("id").as("src")), Seq("src"), "left_semi")
      .join(keep.select(col("id").as("dst")), Seq("dst"), "left_semi")
      .select("src", "dst", "w")
    (e, vertices.join(keep, Seq("id"), "left_semi"))
  }

  /** Initial singleton vertex metadata for an edge frame. */
  def singletonVertices(spark: SparkSession, edges: DataFrame): DataFrame =
    edges.select(col("src").as("id")).distinct()
      .select(col("id"), lit(1L).as("size"),
              lit(Double.PositiveInfinity).as("minMerge"), col("id").as("minLeaf"))
}
