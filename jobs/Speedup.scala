package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{Harness, SpeedupExperiment}

/** T4 (paper Fig. 14): speedup of the highly filtering reddit query as the
  * number of executors grows; also reports aggregated task time.
  *
  * spark-submit --class repro.jobs.Speedup repro.jar [nObjects] [minScore]
  */
object Speedup {
  def main(args: Array[String]): Unit = {
    val n        = args.headOption.map(_.toLong).getOrElse(400_000L)
    val minScore = args.lift(1).map(_.toLong).getOrElse(1000L)
    val spark = SparkSession.builder.appName("T4-speedup").master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val rows = SpeedupExperiment.run(
      spark, n, executorCounts = Seq(1, 2, 4, 8, 16), minScore, reps = 2, Harness.dataRoot)
    SpeedupExperiment.print(rows)
    spark.stop()
  }
}
