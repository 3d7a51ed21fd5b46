package repro.core

import scala.collection.mutable
import repro.core.model._

/** An immutable dendrogram (possibly a forest) over a fixed leaf set.
  *
  * Internal structure is the paper's KVTable representation: for every
  * non-root node, its parent id and the linkage similarity of the merge
  * that created the parent. Leaves have linkage similarity ∞; every
  * internal node has exactly two children ([[validate]]).
  */
final class Dendrogram(val parent: Map[Long, (Long, Double)], val leaves: Vector[Long]) {

  val leafSet: Set[Long] = leaves.toSet

  /** All node ids: leaves plus every parent ever referenced. */
  lazy val nodes: Set[Long] = leafSet ++ parent.keySet ++ parent.valuesIterator.map(_._1)

  lazy val internalNodes: Set[Long] = nodes -- leafSet

  /** children(p) — the (exactly two, after validate) children of p. */
  lazy val childrenMap: Map[Long, Vector[Long]] =
    parent.toVector.groupBy(_._2._1).map { case (p, kids) => p -> kids.map(_._1).sorted }

  /** Linkage similarity of the merge that created `node` (∞ for leaves). */
  lazy val simOf: Map[Long, Double] = {
    val internal = parent.toVector.map { case (_, (p, s)) => p -> s }.toMap
    internal ++ leaves.iterator.map(_ -> Double.PositiveInfinity)
  }

  lazy val roots: Vector[Long] = (nodes -- parent.keySet).toVector.sorted

  def numMerges: Int = internalNodes.size

  /** Structural sanity: binary merges, acyclic, every internal node's sim
    * recorded identically on both child rows, all leaves covered.
    */
  def validate(): Unit = {
    for ((p, kids) <- childrenMap)
      require(kids.size == 2, s"node $p has ${kids.size} children")
    for (n <- internalNodes)
      require(!leafSet.contains(n), s"leaf $n used as internal node")
    // acyclicity: walking up from any node terminates
    for (n <- nodes) {
      var cur = n; var steps = 0
      while (parent.contains(cur)) {
        cur = parent(cur)._1; steps += 1
        require(steps <= nodes.size, s"cycle through node $n")
      }
    }
  }

  /** Algorithm 3: flat clustering at threshold t. Each leaf maps to the
    * topmost ancestor whose linkage similarity is ≥ t (itself if none) —
    * equivalently the unique node with sim ≥ t all of whose ancestors have
    * sim < t. Iterative with memoization (exact-HAC chains are deep).
    */
  def flatten(t: Double): Map[Long, Long] = {
    // topGood(x): topmost node on x's root path (x included) with sim ≥ t,
    // or -1 if none exists above/at x.
    val memo = mutable.HashMap.empty[Long, Long]
    def topGood(x0: Long): Long = {
      var cur = x0
      val path = mutable.ArrayBuffer.empty[Long]
      while (!memo.contains(cur) && parent.contains(cur)) {
        path += cur
        cur = parent(cur)._1
      }
      var acc = memo.getOrElse(cur, {
        val v = if (simOf(cur) >= t) cur else -1L
        memo(cur) = v; v
      })
      // unwind the path top-down
      for (x <- path.reverseIterator) {
        if (acc == -1L && simOf(x) >= t) acc = x
        memo(x) = acc
      }
      memo(x0)
    }
    leaves.iterator.map { l =>
      val c = topGood(l)
      l -> (if (c == -1L) l else c) // leaves have sim ∞ so c == -1 never fires
    }.toMap
  }

  /** Leaves under each node (node → leaf vector), computed bottom-up. */
  lazy val leavesUnder: Map[Long, Vector[Long]] = {
    val out = mutable.HashMap.empty[Long, Vector[Long]]
    for (l <- leaves) out(l) = Vector(l)
    for (n <- topologicalMerges) out(n) = childrenMap(n).flatMap(out)
    out.toMap
  }

  /** Internal nodes in a valid merge order (children before parents). */
  lazy val topologicalMerges: Vector[Long] = {
    val pending = mutable.HashMap.empty[Long, Int]
    val ready = mutable.Queue.empty[Long]
    for ((p, kids) <- childrenMap) {
      val internalKids = kids.count(internalNodes.contains)
      pending(p) = internalKids
      if (internalKids == 0) ready += p
    }
    val order = Vector.newBuilder[Long]
    var emitted = 0
    while (ready.nonEmpty) {
      val n = ready.dequeue()
      order += n; emitted += 1
      parent.get(n).foreach { case (p, _) =>
        pending(p) -= 1
        if (pending(p) == 0) ready += p
      }
    }
    require(emitted == internalNodes.size, "dendrogram is cyclic")
    order.result()
  }
}

object Dendrogram {
  def fromRows(rows: Iterable[DendroRow], leaves: Iterable[Long]): Dendrogram =
    new Dendrogram(rows.iterator.map(r => r.child -> (r.parent, r.sim)).toMap,
                   leaves.toVector.sorted)
}
