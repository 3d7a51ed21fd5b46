package repro.bench

import repro.SparkSpec
import repro.exp.RoundsExperiment

/** Fig. 2/3 companion bench: round counts (and times) of TeraHAC(ε=0.1),
  * OptimizedRAC (TeraHAC ε=0), RAC and ParHAC at t=0.01 on an rMAT graph.
  * BENCH_ROUNDS_SCALE tunes the rMAT scale (default 12).
  */
class RoundsBench extends SparkSpec {

  test("Fig. 2 companion: TeraHAC needs far fewer rounds than RAC/ParHAC") {
    val scale = sys.env.get("BENCH_ROUNDS_SCALE").map(_.toInt).getOrElse(12)
    val rows = RoundsExperiment.run(spark, scale)
    println("\n==== Fig. 2/3 companion (rounds) ====")
    println(RoundsExperiment.format(rows, scale))

    val byName = rows.map(r => r.algorithm -> r).toMap
    val tera = byName("TeraHAC(e=0.1)")
    val optRac = byName("OptimizedRAC (TeraHAC e=0)")
    val rac = byName("RAC (round simulator)")
    val parhac = byName("ParHAC (round simulator)")

    // paper: TeraHAC ε=0.1 runs in at most ~17 rounds on every dataset
    assert(tera.rounds <= 25, s"TeraHAC used ${tera.rounds} rounds")
    // ε=0.1 uses no more rounds than ε=0
    assert(tera.rounds <= optRac.rounds)
    // the headline: RAC and ParHAC need far more rounds (paper: >10-100x on
    // billion-edge graphs; the separation grows with scale, so at rMAT-12
    // we assert ≥3x — raise BENCH_ROUNDS_SCALE to watch it widen)
    assert(rac.rounds >= 3 * tera.rounds,
      s"RAC ${rac.rounds} not ≫ TeraHAC ${tera.rounds}")
    assert(parhac.rounds >= 3 * tera.rounds,
      s"ParHAC ${parhac.rounds} not ≫ TeraHAC ${tera.rounds}")
    // OptimizedRAC (one affinity-partitioned exact round structure) also
    // beats plain RAC's round count (paper: up to two orders of magnitude)
    assert(optRac.rounds < rac.rounds)
  }
}
