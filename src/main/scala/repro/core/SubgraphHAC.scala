package repro.core

import scala.collection.mutable
import repro.core.model._

/** SubgraphHAC (Algorithm 2): performs a maximal sequence of (1+ε)-good
  * merges among the *active* vertices of a local graph.
  *
  * Key monotonicity fact that makes the lazy priority queue exact here:
  * while both endpoints of an edge survive, w(uv), M(u), M(v) are constant
  * and wmax only decreases (Lemma 1) — so goodness(uv) is non-increasing.
  * An edge therefore needs (re-)insertion only
  *   (a) at start, if currently good,
  *   (b) when it is created by a merge, or
  *   (c) when an endpoint's wmax strictly decreases (reported by
  *       [[LocalGraph.merge]]).
  * Stale entries (dead endpoints) are discarded on pop. On termination no
  * (1+ε)-good active–active edge remains (exact maximality — unlike the
  * paper's O((m+n)log²n) lazy-broadcast variant, which guarantees only a
  * (1+Θ(ε)) window; our variant is simpler and strictly stronger, at the
  * cost of occasional wmax rescans that are amortized fine at repro scale).
  */
object SubgraphHAC {

  /** Outcome of one SubgraphHAC call on a partition.
    *
    * @param merges     dendrogram rows (two per merge) in merge order
    * @param assignment every initially-active vertex → its final cluster id
    * @param meta       metadata of every final active cluster
    */
  final case class Result(merges: Vector[DendroRow],
                          assignment: Map[Long, Long],
                          meta: Vector[VertexMeta])

  private final case class Cand(g: Double, u: Long, v: Long)
  // scala PriorityQueue is a max-heap; invert to pop the *lowest* goodness
  // first, tie-broken on (u, v) for determinism.
  private val candOrd: Ordering[Cand] =
    Ordering.by[Cand, (Double, Long, Long)](c => (-c.g, -c.u, -c.v))

  def run(g: LocalGraph, eps: Double): Result = {
    val thresh = (1.0 + eps) * (1.0 + FpSlack)
    val initialActive = g.active.toVector
    val pq = mutable.PriorityQueue.empty[Cand](candOrd)

    def push(u: Long, v: Long): Unit = {
      if (g.isActive(u) && g.isActive(v)) {
        val good = g.goodness(u, v)
        if (good <= thresh) {
          val (a, b) = if (u < v) (u, v) else (v, u)
          pq.enqueue(Cand(good, a, b))
        }
      }
    }

    for ((u, v, _) <- g.undirectedEdges) push(u, v)

    val merges = Vector.newBuilder[DendroRow]
    val parentOf = mutable.HashMap.empty[Long, Long]

    while (pq.nonEmpty) {
      val Cand(_, u, v) = pq.dequeue()
      val alive = g.contains(u) && g.contains(v) && g.weight(u, v).isDefined
      if (alive && g.isActive(u) && g.isActive(v) && g.goodness(u, v) <= thresh) {
        val res = g.merge(u, v)
        merges += DendroRow(u, res.newId, res.sim)
        merges += DendroRow(v, res.newId, res.sim)
        parentOf(u) = res.newId
        parentOf(v) = res.newId
        // (b) fresh edges of the new cluster
        for (a <- g.nbrs(res.newId).keysIterator) push(res.newId, a)
        // (c) neighbors whose wmax dropped: their other edges may have
        // become good
        for (a <- res.wmaxDecreased if g.isActive(a);
             b <- g.nbrs(a).keysIterator) push(a, b)
      }
    }

    val finalCluster = mutable.HashMap.empty[Long, Long]
    def resolve(x: Long): Long = {
      // Iterative path-compression walk (safe against deep merge chains).
      var cur = x
      val path = mutable.ArrayBuffer.empty[Long]
      while (!finalCluster.contains(cur) && parentOf.contains(cur)) {
        path += cur
        cur = parentOf(cur)
      }
      val root = finalCluster.getOrElse(cur, cur)
      path.foreach(finalCluster(_) = root)
      finalCluster(x) = root
      root
    }

    val assignment = initialActive.map(v => v -> resolve(v)).toMap
    val meta = g.active.toVector.sorted.map(v =>
      VertexMeta(v, g.size(v), g.minMerge(v), g.minLeaf(v)))
    Result(merges.result(), assignment, meta)
  }
}
