package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.RoundsExperiment

/** spark-submit entrypoint for the Fig. 2/3 companion (round counts and
  * times of TeraHAC vs OptimizedRAC vs RAC vs ParHAC at t=0.01).
  * Usage: RoundsFig2 [rmatScale]
  */
object RoundsFig2 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("terahac-rounds")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val scale = args.headOption.map(_.toInt).getOrElse(12)
    println(RoundsExperiment.format(RoundsExperiment.run(spark, scale), scale))
    spark.stop()
  }
}
