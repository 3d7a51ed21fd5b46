package repro.baselines

import scala.collection.mutable
import repro.core.LocalGraph
import repro.core.model._

/** ParHAC (Dhulipala et al. [25]) round-level model: per round only edges
  * within a (1+ε) factor of the *global* maximum weight are mergeable, and
  * each round merges a maximal matching among them (weight-descending
  * greedy stands in for ParHAC's random priorities).
  *
  * This reproduces the property Fig. 1/2 exploit: ParHAC's mergeable set is
  * globally gated by w_max, so it needs many more rounds than TeraHAC even
  * at the same ε.
  */
object ParHAC {

  final case class Result(rounds: Int, merges: Vector[DendroRow], cappedOut: Boolean)

  def simulate(g: LocalGraph, eps: Double, t: Double = 0.0,
               maxRounds: Int = 100000): Result = {
    val merges = Vector.newBuilder[DendroRow]
    var rounds = 0
    var capped = false
    var done = false
    while (!done) {
      var wmaxAll = 0.0
      for ((_, _, w) <- g.undirectedEdges if w >= t) if (w > wmaxAll) wmaxAll = w
      if (wmaxAll <= 0.0) done = true
      else {
        val thr = math.max(wmaxAll / (1.0 + eps), t)
        val cands = g.undirectedEdges.filter(_._3 >= thr).toArray
          .sortBy { case (u, v, w) => (-w, u, v) }
        val used = mutable.HashSet.empty[Long]
        rounds += 1
        var any = false
        for ((u, v, _) <- cands if !used.contains(u) && !used.contains(v)) {
          used += u; used += v
          val res = g.merge(u, v)
          merges += DendroRow(u, res.newId, res.sim)
          merges += DendroRow(v, res.newId, res.sim)
          any = true
        }
        if (!any || rounds >= maxRounds) { done = true; capped = rounds >= maxRounds }
      }
    }
    Result(rounds, merges.result(), capped)
  }
}
