package repro.bench

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core.Rumble
import repro.core.model.HeapModelExceeded
import repro.core.runtime.RumbleConf
import repro.datasets.{ConfusionData, RedditData}

/** The three JSONiq queries of the paper's evaluation (§6.1) over the
  * confusion dataset, plus the reddit filtering query of §6.5–6.6. */
object RumbleQueries {

  def filter(path: String): String =
    s"""for $$i in json-file("$path")
       |where $$i.guess eq $$i.target
       |return $$i""".stripMargin

  def group(path: String): String =
    s"""for $$i in json-file("$path")
       |group by $$target := $$i.target
       |return { "target" : $$target, "count" : count($$i) }""".stripMargin

  def sort(path: String): String =
    s"""for $$i in json-file("$path")
       |where $$i.guess eq $$i.target
       |order by $$i.target ascending, $$i.country descending, $$i.date descending
       |return $$i""".stripMargin

  def redditFilter(path: String, minScore: Long): String =
    s"""for $$c in json-file("$path")
       |where $$c.score ge $minScore
       |return $$c""".stripMargin
}

/** Tables T1 (Fig. 11, local) and T3 (Fig. 13, cluster-substitute): the
  * filter / group / sort queries across Rumble, raw Spark, Spark SQL and
  * the PySpark stand-in. Returns (system, query, seconds) rows. */
object SystemComparisonExperiment {

  val systems: Seq[String] = Seq("rumble", "spark-rdd", "spark-sql", "pyspark-sim")

  def run(spark: SparkSession, nObjects: Long, reps: Int,
          scratch: String): Seq[(String, String, Double)] = {
    val path = ConfusionData.generate(spark, s"$scratch/confusion_$nObjects", nObjects)
    val rumble = new Rumble(spark)
    val rows   = scala.collection.mutable.ArrayBuffer.empty[(String, String, Double)]

    // Equalize I/O conditions: pull the measured dataset through the page
    // cache once, so the first system measured does not absorb the cold
    // read that later systems then skip.
    spark.sparkContext.textFile(path).count()

    // Warm-up: exercise each engine path on a mid-size input so JVM/Spark
    // first-job costs (C2 JIT of the parser/serde hot loops, codegen,
    // classloading) are not charged to whichever system runs first.
    val warmPath = ConfusionData.generate(spark, s"$scratch/confusion_warm", 50_000)
    rumble.runCount(RumbleQueries.filter(warmPath))
    rumble.runCount(RumbleQueries.group(warmPath))
    rumble.writeJsonLines(RumbleQueries.sort(warmPath), Harness.freshDir(scratch, "warm_r"))
    RawSparkBaseline.filterQuery(spark, warmPath)
    RawSparkBaseline.groupQuery(spark, warmPath)
    SparkSqlBaseline.filterQuery(spark, warmPath)
    SparkSqlBaseline.sortQuery(spark, warmPath, Harness.freshDir(scratch, "warm_s"))
    PySparkSimBaseline.filterQuery(spark, warmPath)
    PySparkSimBaseline.groupQuery(spark, warmPath)

    def sortOut(sys: String) = Harness.freshDir(scratch, s"sortout_$sys")

    def once(sys: String, q: String): Unit = (sys, q) match {
      case ("rumble", "filter")      => rumble.runCount(RumbleQueries.filter(path))
      case ("rumble", "group")       => rumble.runCount(RumbleQueries.group(path))
      case ("rumble", "sort")        =>
        rumble.writeJsonLines(RumbleQueries.sort(path), sortOut(sys))
      case ("spark-rdd", "filter")   => RawSparkBaseline.filterQuery(spark, path)
      case ("spark-rdd", "group")    => RawSparkBaseline.groupQuery(spark, path)
      case ("spark-rdd", "sort")     => RawSparkBaseline.sortQuery(spark, path, sortOut(sys))
      case ("spark-sql", "filter")   => SparkSqlBaseline.filterQuery(spark, path)
      case ("spark-sql", "group")    => SparkSqlBaseline.groupQuery(spark, path)
      case ("spark-sql", "sort")     => SparkSqlBaseline.sortQuery(spark, path, sortOut(sys))
      case ("pyspark-sim", "filter") => PySparkSimBaseline.filterQuery(spark, path)
      case ("pyspark-sim", "group")  => PySparkSimBaseline.groupQuery(spark, path)
      case ("pyspark-sim", "sort")   => PySparkSimBaseline.sortQuery(spark, path, sortOut(sys))
      case _ => ()
    }

    // Round-robin over systems within each repetition so transient noise
    // (GC, container co-tenancy) spreads evenly instead of hitting
    // whichever system happens to run first; report per-cell medians.
    val samples = scala.collection.mutable.Map
      .empty[(String, String), List[Double]].withDefaultValue(Nil)
    for (_ <- 1 to reps; q <- Seq("filter", "group", "sort"); sys <- systems) {
      val (_, secs) = Harness.time(once(sys, q))
      samples((sys, q)) ::= secs
      // drop blocks cached by the order-by type-discovery pass so later
      // measurements start from the same memory state
      spark.sqlContext.clearCache()
    }
    for (sys <- systems; q <- Seq("filter", "group", "sort"))
      rows += ((sys, q, Harness.median(samples((sys, q)))))
    rows.toSeq
  }

  def print(title: String, rows: Seq[(String, String, Double)]): Unit = {
    val queries = Seq("filter", "group", "sort")
    Harness.printTable(title,
      "system" +: queries.map(_ + " [s]"),
      systems.map(s => s +: queries.map(q =>
        Harness.fmtSec(rows.find(r => r._1 == s && r._2 == q).map(_._3).getOrElse(Double.NaN)))))
  }
}

/** Table T2 (Fig. 12): Rumble vs the single-threaded Zorba/Xidel stand-ins
  * across input sizes; DNF("oom") when the modeled heap is exceeded.
  * Returns (engine, query, size, result) rows, result = seconds or "DNF". */
object EngineComparisonExperiment {

  val engines: Seq[String] = Seq("rumble", "zorba-sim", "xidel-sim")

  def run(spark: SparkSession, sizes: Seq[Long], zorbaCap: Long, xidelCap: Long,
          scratch: String): Seq[(String, String, Long, String)] = {
    val rows = scala.collection.mutable.ArrayBuffer.empty[(String, String, Long, String)]
    for (n <- sizes) {
      val file = ConfusionData.generateLocalFile(s"$scratch/confusion_single_$n.json", n)
      for (engineName <- engines) {
        val engine = engineName match {
          case "rumble"    => new Rumble(spark)
          case "zorba-sim" => SingleThreadedEngines.zorbaSim(spark, Some(zorbaCap))
          case "xidel-sim" => SingleThreadedEngines.xidelSim(spark, Some(xidelCap))
        }
        for (q <- Seq("filter", "group", "sort")) {
          val query = q match {
            case "filter" => RumbleQueries.filter(file)
            case "group"  => RumbleQueries.group(file)
            case "sort"   => RumbleQueries.sort(file)
          }
          val res =
            try Harness.fmtSec(Harness.time(engine.runCount(query))._2)
            catch { case _: HeapModelExceeded => "DNF(oom)" }
          rows += ((engineName, q, n, res))
          spark.sqlContext.clearCache()
        }
      }
    }
    rows.toSeq
  }

  def print(rows: Seq[(String, String, Long, String)]): Unit = {
    val sizes = rows.map(_._3).distinct.sorted
    for (q <- Seq("filter", "group", "sort")) {
      Harness.printTable(s"T2 (Fig. 12) — $q query, runtime by input size",
        "engine" +: sizes.map(s => s"$s obj"),
        engines.map(e => e +: sizes.map(n =>
          rows.find(r => r._1 == e && r._2 == q && r._3 == n).map(_._4).getOrElse("-"))))
    }
  }
}

/** Table T4 (Fig. 14): speedup of the highly filtering reddit query with
  * the executor count. An N-executor cluster is modeled by coalescing the
  * pipeline to N partitions on local[*] (each partition ≅ one executor
  * core); wall-clock plus aggregated task time are reported. */
object SpeedupExperiment {

  def run(spark: SparkSession, nObjects: Long, executorCounts: Seq[Int], minScore: Long,
          reps: Int, scratch: String): Seq[(Int, Double, Double)] = {
    val path   = RedditData.generate(spark, s"$scratch/reddit_$nObjects", nObjects)
    val rumble = new Rumble(spark)
    // equalize I/O conditions across executor counts: pull the input
    // through the page cache, and JIT-warm the query path once
    spark.sparkContext.textFile(path).count()
    rumble.runCount(RumbleQueries.redditFilter(path, minScore))
    executorCounts.map { n =>
      val samples = (1 to reps).map { _ =>
        Harness.withTaskTime(spark) {
          rumble.runToRdd(RumbleQueries.redditFilter(path, minScore))
            .coalesce(n, shuffle = false)
            .count()
        }
      }
      val wall = Harness.median(samples.map(_._1))
      val agg  = Harness.median(samples.map(_._2))
      (n, wall, agg)
    }
  }

  def print(rows: Seq[(Int, Double, Double)]): Unit =
    Harness.printTable("T4 (Fig. 14) — speedup over the reddit dataset",
      Seq("executors", "runtime [s]", "aggregated task time [s]", "speedup vs 1"),
      rows.map { case (n, w, a) =>
        Seq(n.toString, Harness.fmtSec(w), Harness.fmtSec(a),
            f"${rows.head._2 / w}%.2fx")
      })
}

/** Table T5 (Fig. 15): runtime of the filtering query vs input size
  * (linearity check — "the curve is very linear"). */
object LargeScaleExperiment {

  def run(spark: SparkSession, sizes: Seq[Long], minScore: Long, reps: Int,
          scratch: String): Seq[(Long, Double, Long)] = {
    val rumble = new Rumble(spark)
    sizes.map { n =>
      val path  = RedditData.generate(spark, s"$scratch/reddit_$n", n)
      // pull this size's input through the page cache before timing
      spark.sparkContext.textFile(path).count()
      var matched = 0L
      val secs = Harness.timedMedian(reps) {
        matched = rumble.runCount(RumbleQueries.redditFilter(path, minScore))
      }
      (n, secs, matched)
    }
  }

  def print(rows: Seq[(Long, Double, Long)]): Unit =
    Harness.printTable("T5 (Fig. 15) — filter runtime vs collection size",
      Seq("objects", "runtime [s]", "matches", "sec per 1M obj"),
      rows.map { case (n, s, m) =>
        Seq(n.toString, Harness.fmtSec(s), m.toString, f"${s / (n / 1e6)}%.2f")
      })
}
