package repro.partition

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Size-constrained affinity clustering (Bateni et al. [7], size constraint
  * per Epasto et al. [27]) — TeraHAC's round partitioner.
  *
  * Every vertex marks its maximum-weight incident edge (ties broken toward
  * the smaller neighbor id); connected components of the marked edges form
  * the affinity clusters. A vertex's best edge is the most likely to induce
  * a good merge, and affinity keeps every best edge intra-cluster — unless
  * the size cap forces a split.
  *
  * Size constraint (locality-preserving, as in [27]): within each affinity
  * component the marked edges are processed in decreasing weight order and
  * greedily unioned as long as the combined directed-edge load (Σ degrees)
  * stays within `capEdges`. Heavy best-edges are therefore kept
  * intra-partition even when a component must be split — a random
  * (hash-based) split would cut most best edges and stall the round.
  * Each component's capped union runs inside one `flatMapGroups` task; the
  * per-group data is O(component vertices), not O(edges).
  *
  * Cluster ids are the minimum member vertex id of each capped group —
  * globally unique because clusters partition the vertex set.
  */
object AffinityPartitioner {

  /** One marked (best) edge with the grouping/bookkeeping metadata. */
  final case class MarkedEdge(root: Long, v: Long, to: Long, w: Double, deg: Long)

  /** @param edges symmetric (src, dst, w)
    * @param salt  kept for API stability; the greedy split is deterministic
    * @return (id, cid) for every vertex with ≥ 1 edge
    */
  def partition(edges: DataFrame, capEdges: Long, salt: Long): DataFrame = {
    val spark = edges.sparkSession
    import spark.implicits._
    // arg-max edge per vertex: max over (w, -dst) picks w desc, dst asc.
    val best = edges
      .groupBy(col("src").as("id"))
      .agg(max(struct(col("w"), (-col("dst")).as("nd"), col("dst"))).as("m"))
      .select(col("id"), col("m.dst").as("to"), col("m.w").as("w"))
    val comps = Functional.components(best.select("id", "to")) // (id, root)
    val deg = edges.groupBy(col("src").as("id")).agg(count("*").as("deg"))

    val marked = best.join(comps, "id").join(deg, "id")
      .select(col("root"), col("id").as("v"), col("to"), col("w"), col("deg"))
      .as[MarkedEdge]

    marked.groupByKey(_.root)
      .flatMapGroups((_, it) => cappedUnion(it, capEdges))
      .toDF("id", "cid")
  }

  /** Greedy capped union of one affinity component's marked edges. */
  private[partition] def cappedUnion(it: Iterator[MarkedEdge],
                                     capEdges: Long): Iterator[(Long, Long)] = {
    val es = it.toArray
    val parent = scala.collection.mutable.HashMap.empty[Long, Long]
    val load = scala.collection.mutable.HashMap.empty[Long, Long]
    def find(x: Long): Long = {
      var r = x
      while (parent.getOrElse(r, r) != r) r = parent(r)
      var c = x
      while (parent.getOrElse(c, c) != c) { val n = parent(c); parent(c) = r; c = n }
      r
    }
    for (e <- es) load(e.v) = e.deg
    // weight-descending greedy: the heaviest best-edges are the most likely
    // good merges and must stay intra-partition
    for (e <- es.sortBy(x => (-x.w, x.v)) if e.v != e.to) {
      val ra = find(e.v)
      val rb = find(e.to)
      if (ra != rb && load(ra) + load(rb) <= capEdges) {
        val (keep, drop) = if (ra < rb) (ra, rb) else (rb, ra)
        parent(drop) = keep
        load(keep) = load(keep) + load(drop)
        load.remove(drop)
      }
    }
    es.iterator.map(e => (e.v, find(e.v)))
  }
}
