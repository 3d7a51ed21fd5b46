package repro.exp

import org.apache.spark.sql.SparkSession
import repro.SynthGraphs
import repro.baselines.{ParHAC, RAC}
import repro.core.{LocalGraph, TeraHAC}

/** Fig. 2/3 companion (the paper's headline round-complexity claim):
  * rounds and running time of TeraHAC(ε=0.1) vs OptimizedRAC
  * (TeraHAC ε=0) — both via the distributed implementation — and rounds of
  * the RAC and ParHAC merge rules via their round simulators, all at the
  * paper's threshold t = 0.01.
  */
object RoundsExperiment {

  final case class Row(algorithm: String, rounds: Int, millis: Long, capped: Boolean)

  def run(spark: SparkSession, rmatScale: Int = 12, t: Double = 0.01): Vector[Row] = {
    val g = SynthGraphs.rmat(spark, rmatScale).persist()
    val m = g.count()
    // Emulate the paper's regime (10M-edge partitions ≪ trillion-edge
    // graph): cap partitions well below the graph size so cross-partition
    // edges actually gate merges across rounds.
    val cap = math.max(2048L, m / 64)
    val local = SynthGraphs.collectUndirected(g)
    val rows = Vector.newBuilder[Row]

    def timeMs[A](body: => A): (A, Long) = {
      val t0 = System.nanoTime()
      val a = body
      (a, (System.nanoTime() - t0) / 1000000L)
    }

    val (r1, ms1) = timeMs(TeraHAC.run(spark, g, eps = 0.1, t = t,
      maxClusterEdges = cap, maxRounds = 400))
    rows += Row("TeraHAC(e=0.1)", r1.rounds, ms1, capped = false)
    val (r0, ms0) = timeMs(TeraHAC.run(spark, g, eps = 0.0, t = t,
      maxClusterEdges = cap, maxRounds = 400))
    rows += Row("OptimizedRAC (TeraHAC e=0)", r0.rounds, ms0, capped = false)

    val (rac, msR) = timeMs(RAC.simulate(LocalGraph.fromEdges(local), t, maxRounds = 20000))
    rows += Row("RAC (round simulator)", rac.rounds, msR, rac.cappedOut)
    val (par, msP) = timeMs(ParHAC.simulate(LocalGraph.fromEdges(local), 0.1, t, maxRounds = 20000))
    rows += Row("ParHAC (round simulator)", par.rounds, msP, par.cappedOut)

    g.unpersist()
    rows.result()
  }

  def format(rows: Seq[Row], scale: Int): String = {
    val sb = new StringBuilder
    sb.append(s"\nrMAT-$scale, t=0.01 (simulator times are single-machine, ")
    sb.append("distributed times include Spark overhead)\n")
    sb.append("| algorithm | rounds | seconds |\n|---|---|---|\n")
    for (r <- rows) {
      val rr = if (r.capped) s">=${r.rounds}" else r.rounds.toString
      sb.append(f"| ${r.algorithm} | $rr | ${r.millis / 1000.0}%.1f |%n")
    }
    sb.toString
  }
}
