package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.QualityExperiment

/** spark-submit entrypoint for Table 2 (quality comparison on the four
  * labeled datasets). Usage: Table2Quality [datasetName ...]
  */
object Table2Quality {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("terahac-table2")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val specs =
      if (args.isEmpty) repro.SynthPoints.QualityDatasets
      else repro.SynthPoints.QualityDatasets.filter(s => args.contains(s.name))
    println(QualityExperiment.format(QualityExperiment.run(spark, specs)))
    spark.stop()
  }
}
