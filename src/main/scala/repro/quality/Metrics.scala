package repro.quality

import scala.collection.mutable
import repro.core.{Dendrogram, LocalGraph}

/** Clustering quality measures used in the paper's evaluation (§6.1):
  * ARI, NMI, Dendrogram Purity [29], Dasgupta cost [20], precision/recall
  * over labeled pairs (§6.3) and the Empirical Approximation Ratio
  * (Definition 3 / Lemma 3).
  */
object Metrics {

  private def contingency(a: Map[Long, Long], b: Map[Long, Long])
      : (Map[(Long, Long), Long], Map[Long, Long], Map[Long, Long], Long) = {
    require(a.keySet == b.keySet, "clusterings must cover the same elements")
    val joint = mutable.HashMap.empty[(Long, Long), Long]
    val ca = mutable.HashMap.empty[Long, Long]
    val cb = mutable.HashMap.empty[Long, Long]
    for (k <- a.keys) {
      val (x, y) = (a(k), b(k))
      joint((x, y)) = joint.getOrElse((x, y), 0L) + 1
      ca(x) = ca.getOrElse(x, 0L) + 1
      cb(y) = cb.getOrElse(y, 0L) + 1
    }
    (joint.toMap, ca.toMap, cb.toMap, a.size.toLong)
  }

  private def choose2(n: Long): Double = n.toDouble * (n - 1) / 2.0

  /** Adjusted Rand Index between two clusterings (1 = identical partitions). */
  def ari(a: Map[Long, Long], b: Map[Long, Long]): Double = {
    val (joint, ca, cb, n) = contingency(a, b)
    val sumIdx = joint.valuesIterator.map(choose2).sum
    val sumA = ca.valuesIterator.map(choose2).sum
    val sumB = cb.valuesIterator.map(choose2).sum
    val total = choose2(n)
    if (total == 0) return 1.0
    val expected = sumA * sumB / total
    val maxIdx = (sumA + sumB) / 2.0
    if (maxIdx == expected) 1.0 else (sumIdx - expected) / (maxIdx - expected)
  }

  /** Normalized Mutual Information, arithmetic-mean normalization (the
    * sklearn default the paper compares against).
    */
  def nmi(a: Map[Long, Long], b: Map[Long, Long]): Double = {
    val (joint, ca, cb, n) = contingency(a, b)
    val nd = n.toDouble
    def entropy(c: Map[Long, Long]): Double =
      -c.valuesIterator.map { v => val p = v / nd; p * math.log(p) }.sum
    val ha = entropy(ca)
    val hb = entropy(cb)
    var mi = 0.0
    for (((x, y), v) <- joint) {
      val pxy = v / nd
      mi += pxy * math.log(pxy / ((ca(x) / nd) * (cb(y) / nd)))
    }
    val norm = (ha + hb) / 2.0
    if (norm == 0.0) 1.0 else math.max(0.0, mi / norm)
  }

  /** Dendrogram Purity [29]. Pairs whose lca is internal node d with
    * children L, R contribute through the cross product of per-class
    * counts; for a forest, pairs split across roots meet at a virtual root
    * containing every leaf.
    */
  def dendrogramPurity(d: Dendrogram, labels: Map[Long, Long]): Double = {
    val classCount = labels.valuesIterator.toVector.groupBy(identity).map {
      case (c, v) => c -> v.size.toLong
    }
    val totalLeaves = d.leaves.size.toLong
    // per-node class histograms, bottom-up
    val hist = mutable.HashMap.empty[Long, mutable.HashMap[Long, Long]]
    val nodeSize = mutable.HashMap.empty[Long, Long]
    for (l <- d.leaves) {
      hist(l) = mutable.HashMap(labels(l) -> 1L)
      nodeSize(l) = 1L
    }
    var num = 0.0
    var pairs = 0.0
    def cross(hL: mutable.HashMap[Long, Long], hR: mutable.HashMap[Long, Long],
              hD: mutable.HashMap[Long, Long], sD: Long): Unit = {
      val (small, big) = if (hL.size <= hR.size) (hL, hR) else (hR, hL)
      for ((c, nl) <- small; nr <- big.get(c)) {
        val p = 2.0 * nl * nr // ordered pairs
        num += p * (hD(c).toDouble / sD)
        pairs += p
      }
    }
    for (n <- d.topologicalMerges) {
      val Vector(l, r) = d.childrenMap(n)
      val (hL, hR) = (hist(l), hist(r))
      val merged = mutable.HashMap.empty[Long, Long]
      for ((c, v) <- hL) merged(c) = v
      for ((c, v) <- hR) merged(c) = merged.getOrElse(c, 0L) + v
      val sz = nodeSize(l) + nodeSize(r)
      hist(n) = merged
      nodeSize(n) = sz
      cross(hL, hR, merged, sz)
      hist.remove(l); hist.remove(r)
    }
    // virtual root across remaining roots
    if (d.roots.size > 1) {
      val rootHists = d.roots.map(hist)
      val total = mutable.HashMap.empty[Long, Long]
      for (h <- rootHists; (c, v) <- h) total(c) = total.getOrElse(c, 0L) + v
      // all cross-root pairs have lca = virtual root of size totalLeaves
      val perClassInRoots = rootHists.map(_.toMap)
      for (c <- classCount.keys) {
        val counts = perClassInRoots.map(_.getOrElse(c, 0L))
        val sumC = counts.sum
        val crossPairs = sumC.toDouble * sumC - counts.map(x => x.toDouble * x).sum
        if (crossPairs > 0) {
          num += crossPairs * (total(c).toDouble / totalLeaves)
          pairs += crossPairs
        }
      }
    }
    if (pairs == 0) 1.0 else num / pairs
  }

  /** Dasgupta cost [20] over a complete similarity graph given as a local
    * edge list: Σ_{(u,v)} |lca(u,v)| · w(u,v), replayed via raw cross-sum
    * folding (O(n²) for a complete graph). Pairs split across roots of a
    * forest are charged the full leaf count (virtual root).
    */
  def dasguptaCost(d: Dendrogram, simEdges: Iterable[(Long, Long, Double)]): Double = {
    val raw = mutable.HashMap.empty[Long, mutable.HashMap[Long, Double]]
    def addRaw(u: Long, v: Long, w: Double): Unit =
      raw.getOrElseUpdate(u, mutable.HashMap.empty)(v) = w
    for ((u, v, w) <- simEdges if u != v) { addRaw(u, v, w); addRaw(v, u, w) }

    val sz = mutable.HashMap.empty[Long, Long]
    for (l <- d.leaves) sz(l) = 1L
    var cost = 0.0
    for (n <- d.topologicalMerges) {
      val Vector(l, r) = d.childrenMap(n)
      val s = sz(l) + sz(r)
      sz(n) = s
      val rl = raw.getOrElse(l, mutable.HashMap.empty)
      val rr = raw.getOrElse(r, mutable.HashMap.empty)
      cost += s * rl.getOrElse(r, 0.0)
      // fold r into l under the new name n
      val merged = if (rl.size >= rr.size) rl else rr
      val other = if (merged eq rl) rr else rl
      merged.remove(l); merged.remove(r)
      other.remove(l); other.remove(r)
      for ((a, w) <- other) merged(a) = merged.getOrElse(a, 0.0) + w
      for ((a, _) <- merged) {
        val na = raw(a)
        val wl = na.remove(l).getOrElse(0.0)
        val wr = na.remove(r).getOrElse(0.0)
        na(n) = wl + wr
      }
      raw.remove(l); raw.remove(r)
      raw(n) = merged
    }
    // cross-root pairs: lca = virtual root with every leaf beneath it
    val nLeaves = d.leaves.size.toLong
    var crossRoot = 0.0
    val rootIds = d.roots.toSet
    for (rt <- d.roots; m <- raw.get(rt); (a, w) <- m if rootIds.contains(a) && rt < a)
      crossRoot += w
    cost + nLeaves * crossRoot
  }

  /** Precision/recall of "same cluster" predictions over labeled pairs. */
  def precisionRecall(clusters: Map[Long, Long],
                      pairs: Iterable[(Long, Long, Boolean)]): (Double, Double) = {
    var tp = 0L; var fp = 0L; var fn = 0L
    for ((a, b, pos) <- pairs) {
      val same = (for (x <- clusters.get(a); y <- clusters.get(b)) yield x == y)
        .getOrElse(false)
      if (same && pos) tp += 1
      else if (same && !pos) fp += 1
      else if (!same && pos) fn += 1
    }
    val prec = if (tp + fp == 0) 1.0 else tp.toDouble / (tp + fp)
    val rec = if (tp + fn == 0) 1.0 else tp.toDouble / (tp + fn)
    (prec, rec)
  }

  /** Empirical approximation ratio (Lemma 3): replay the dendrogram's
    * greedy merge sequence on the original graph; the ratio of a merge is
    * (max current edge weight) / (merge similarity); the dendrogram is
    * (1+ε)-approximate exactly for the maximum ratio 1+ε.
    *
    * Merge similarities between two surviving clusters are constant, so
    * available merges keep their similarity once both children exist; a
    * lazy max-heap over live edges tracks the global maximum.
    */
  def empiricalApproxRatio(edges: Iterable[(Long, Long, Double)], d: Dendrogram): Double = {
    val g = LocalGraph.fromEdges(edges)
    val children = d.childrenMap
    val parentOf = d.parent

    // available-merge max-heap keyed by current (constant) similarity
    case class Avail(w: Double, node: Long)
    val availOrd: Ordering[Avail] = Ordering.by(a => (a.w, -a.node))
    val avail = mutable.PriorityQueue.empty[Avail](availOrd)
    val childrenDone = mutable.HashMap.empty[Long, Int]

    def tryActivate(node: Long): Unit = {
      val Vector(l, r) = children(node)
      if (g.contains(l) && g.contains(r)) {
        val w = g.weight(l, r).getOrElse(0.0)
        avail.enqueue(Avail(w, node))
      }
    }

    for (n <- d.internalNodes) {
      val done = children(n).count(c => d.leafSet.contains(c))
      childrenDone(n) = done
      if (done == 2) tryActivate(n)
    }

    // lazy max-heap over live edges for the global max weight
    case class E(w: Double, u: Long, v: Long)
    val eOrd: Ordering[E] = Ordering.by(e => (e.w, -e.u, -e.v))
    val maxE = mutable.PriorityQueue.empty[E](eOrd)
    for ((u, v, w) <- g.undirectedEdges) maxE.enqueue(E(w, u, v))
    def currentMax(): Double = {
      while (maxE.nonEmpty) {
        val e = maxE.head
        if (g.contains(e.u) && g.contains(e.v) && g.weight(e.u, e.v).contains(e.w))
          return e.w
        maxE.dequeue()
      }
      0.0
    }

    var ratio = 1.0
    var done = 0
    val totalMerges = d.internalNodes.size
    while (done < totalMerges) {
      require(avail.nonEmpty, "greedy replay stuck: dendrogram inconsistent with graph")
      val Avail(w, node) = avail.dequeue()
      val Vector(l, r) = children(node)
      require(g.contains(l) && g.contains(r), "available merge had dead children")
      require(w > 0.0, s"merge $node has zero similarity in replay")
      ratio = math.max(ratio, currentMax() / w)
      val res = g.merge(l, r)
      require(res.newId == node,
        s"replay id mismatch: expected $node got ${res.newId}")
      for ((a, wNew) <- g.nbrs(node)) maxE.enqueue(E(wNew, node, a))
      done += 1
      parentOf.get(node).foreach { case (p, _) =>
        childrenDone(p) = childrenDone.getOrElse(p, 0) + 1
        if (childrenDone(p) == 2) tryActivate(p)
      }
    }
    ratio
  }
}
