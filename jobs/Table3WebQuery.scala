package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.WebQueryExperiment

/** spark-submit entrypoint for Table 3 (median running times + PR points
  * on the Web-Query stand-in). Usage: Table3WebQuery [n] [runs]
  */
object Table3WebQuery {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("terahac-table3")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val n = args.headOption.map(_.toLong).getOrElse(60000L)
    val runs = args.lift(1).map(_.toInt).getOrElse(3)
    println(WebQueryExperiment.format(WebQueryExperiment.run(spark, n, runs = runs)))
    spark.stop()
  }
}
