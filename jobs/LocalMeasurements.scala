package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{Harness, SystemComparisonExperiment}

/** T1 (paper Fig. 11): local measurements of the filter/group/sort queries
  * for Rumble vs raw Spark vs Spark SQL vs the PySpark stand-in.
  *
  * spark-submit --class repro.jobs.LocalMeasurements repro.jar [nObjects] [reps]
  */
object LocalMeasurements {
  def main(args: Array[String]): Unit = {
    val n    = args.headOption.map(_.toLong).getOrElse(500_000L)
    val reps = args.lift(1).map(_.toInt).getOrElse(2)
    val spark = SparkSession.builder.appName("T1-local").master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val rows = SystemComparisonExperiment.run(spark, n, reps, Harness.dataRoot)
    SystemComparisonExperiment.print(s"T1 (Fig. 11) — local, $n objects", rows)
    spark.stop()
  }
}
