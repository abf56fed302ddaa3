package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.{EngineComparisonExperiment, Harness}

/** T2 (paper Fig. 12): Rumble vs single-threaded JSONiq engine stand-ins
  * (Zorba, Xidel) across input sizes, with out-of-memory DNFs.
  *
  * spark-submit --class repro.jobs.EngineComparison repro.jar [maxSize]
  */
object EngineComparison {
  def main(args: Array[String]): Unit = {
    val max   = args.headOption.map(_.toLong).getOrElse(512_000L)
    val sizes = Iterator.iterate(max)(_ / 2).takeWhile(_ >= 16_000L).toSeq.reverse
    val spark = SparkSession.builder.appName("T2-engines").master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    val rows = EngineComparisonExperiment.run(
      spark, sizes, zorbaCap = max / 4, xidelCap = max / 4, Harness.dataRoot)
    EngineComparisonExperiment.print(rows)
    spark.stop()
  }
}
