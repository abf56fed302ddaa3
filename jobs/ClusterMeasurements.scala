package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{Harness, SystemComparisonExperiment}

/** T3 (paper Fig. 13): "cluster" measurements — same queries and systems as
  * T1 on the 20×-replicated dataset. The 9-node EMR cluster is substituted
  * by local[*] with shuffles exercised (broadcast joins disabled, 64
  * shuffle partitions, see repro.SparkSpec).
  *
  * spark-submit --class repro.jobs.ClusterMeasurements repro.jar [nObjects]
  */
object ClusterMeasurements {
  def main(args: Array[String]): Unit = {
    val n     = args.headOption.map(_.toLong).getOrElse(1_000_000L)
    val spark = SparkSession.builder.appName("T3-cluster").master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .config("spark.sql.shuffle.partitions", 64)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    val rows = SystemComparisonExperiment.run(spark, n, reps = 1, Harness.dataRoot)
    SystemComparisonExperiment.print(s"T3 (Fig. 13) — cluster-substitute, $n objects (20x)", rows)
    spark.stop()
  }
}
