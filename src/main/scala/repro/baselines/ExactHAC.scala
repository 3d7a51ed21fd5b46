package repro.baselines

import scala.collection.mutable
import repro.core.LocalGraph
import repro.core.model._

/** Exact (1-approximate) sequential average-linkage graph HAC — the gold
  * baseline ("Sci-Avg" in Table 2 when run over the complete similarity
  * graph, and the reference dendrogram for TeraHAC(ε=0) equivalence).
  *
  * Uses a lazy max-heap over edges. Average-linkage weight between two
  * surviving clusters is constant until one of them merges, so a popped
  * entry is valid iff both endpoints are still alive and adjacent — no
  * re-keying is ever needed.
  *
  * Node ids follow the same consumed-minLeaf scheme as SubgraphHAC, so an
  * identical merge tree yields identical node ids across implementations.
  */
object ExactHAC {

  private final case class Cand(w: Double, u: Long, v: Long)
  private val ord: Ordering[Cand] =
    Ordering.by[Cand, (Double, Long, Long)](c => (c.w, -c.u, -c.v))

  /** Runs HAC to completion (merging every edge with weight > stopBelow)
    * and returns the dendrogram rows in merge order. Mutates `g`.
    */
  def run(g: LocalGraph, stopBelow: Double = 0.0): Vector[DendroRow] = {
    val pq = mutable.PriorityQueue.empty[Cand](ord)
    for ((u, v, w) <- g.undirectedEdges if w > stopBelow) pq.enqueue(Cand(w, u, v))
    val out = Vector.newBuilder[DendroRow]
    while (pq.nonEmpty) {
      val Cand(_, u, v) = pq.dequeue()
      if (g.contains(u) && g.contains(v) && g.weight(u, v).isDefined) {
        val res = g.merge(u, v)
        out += DendroRow(u, res.newId, res.sim)
        out += DendroRow(v, res.newId, res.sim)
        for ((a, w) <- g.nbrs(res.newId) if w > stopBelow)
          pq.enqueue(Cand(w, res.newId, a))
      }
    }
    out.result()
  }

  /** Convenience: exact HAC dendrogram of an undirected edge list. */
  def dendrogram(edges: Iterable[(Long, Long, Double)],
                 stopBelow: Double = 0.0): repro.core.Dendrogram = {
    val g = LocalGraph.fromEdges(edges)
    val leaves = g.vertices.toVector
    val rows = run(g, stopBelow)
    repro.core.Dendrogram.fromRows(rows, leaves)
  }
}
