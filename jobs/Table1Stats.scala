package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.StatsExperiment

/** spark-submit entrypoint for Table 1 (graph input statistics).
  * Usage: Table1Stats [rmatScales csv] [webQueryN]
  */
object Table1Stats {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("terahac-table1")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val scales = args.headOption.map(_.split(',').map(_.toInt).toSeq)
      .getOrElse(Seq(10, 12, 14))
    val wqN = args.lift(1).map(_.toLong).getOrElse(60000L)
    println(StatsExperiment.format(StatsExperiment.run(spark, scales, wqN)))
    spark.stop()
  }
}
