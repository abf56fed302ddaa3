package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{Harness, LargeScaleExperiment}

/** T5 (paper Fig. 15): filter-query runtime vs collection size — the
  * linear-scaling experiment (paper: up to 21.6 G objects / 12 TB on 10
  * nodes; here 2^k-replicated reddit-sim data on one machine).
  *
  * spark-submit --class repro.jobs.LargeScale repro.jar [baseObjects] [steps]
  */
object LargeScale {
  def main(args: Array[String]): Unit = {
    val base  = args.headOption.map(_.toLong).getOrElse(200_000L)
    val steps = args.lift(1).map(_.toInt).getOrElse(4)
    val sizes = (0 until steps).map(k => base << k)
    val spark = SparkSession.builder.appName("T5-scale").master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val rows = LargeScaleExperiment.run(spark, sizes, minScore = 1000L, reps = 1, Harness.dataRoot)
    LargeScaleExperiment.print(rows)
    spark.stop()
  }
}
