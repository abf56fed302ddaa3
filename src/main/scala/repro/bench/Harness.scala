package repro.bench

import java.io.File
import java.util.concurrent.atomic.AtomicLong
import org.apache.spark.scheduler.{SparkListener, SparkListenerTaskEnd}
import org.apache.spark.sql.SparkSession

/** Shared benchmark utilities: wall-clock timing, medians, aggregated
  * task-time measurement via a SparkListener (for the §6.5 speedup
  * analysis), table printing, and scratch-dir helpers.
  */
object Harness {

  /** Wall-clock a thunk; returns (result, seconds). */
  def time[T](f: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r  = f
    ((r, (System.nanoTime() - t0) / 1e9))
  }

  def median(xs: Seq[Double]): Double = {
    val s = xs.sorted
    if (s.isEmpty) Double.NaN
    else if (s.size % 2 == 1) s(s.size / 2)
    else (s(s.size / 2 - 1) + s(s.size / 2)) / 2
  }

  /** Run `reps` times, return the median seconds (first run includes any
    * warm-up effects; reps >= 2 recommended for stable numbers). */
  def timedMedian(reps: Int)(f: => Any): Double =
    median((1 to reps).map(_ => time(f)._2))

  /** Listener summing task durations — "aggregated runtime over the
    * cluster" in the paper's Fig. 14. */
  private final class TaskTimeListener extends SparkListener {
    val totalMs = new AtomicLong(0)
    override def onTaskEnd(e: SparkListenerTaskEnd): Unit =
      if (e.taskInfo != null) totalMs.addAndGet(e.taskInfo.duration)
  }

  /** Measure a thunk's wall-clock and the summed task time of every Spark
    * task it schedules. Returns (wallSeconds, aggregatedTaskSeconds). */
  def withTaskTime(spark: SparkSession)(f: => Any): (Double, Double) = {
    val l = new TaskTimeListener
    spark.sparkContext.addSparkListener(l)
    try {
      val (_, wall) = time(f)
      // listener events are posted asynchronously; give the bus time to drain
      Thread.sleep(300)
      (wall, l.totalMs.get() / 1e3)
    } finally spark.sparkContext.removeSparkListener(l)
  }

  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    println()
    println(s"== $title ==")
    println(fmt(header))
    println(widths.map("-" * _).mkString("|-", "-|-", "-|"))
    rows.foreach(r => println(fmt(r)))
    println()
  }

  def fmtSec(s: Double): String = f"$s%.2f"

  /** Delete-and-return a scratch output directory path. */
  def freshDir(base: String, name: String): String = {
    val d = new File(base, name)
    deleteRecursively(d)
    d.getAbsolutePath
  }

  def deleteRecursively(f: File): Unit = {
    if (f.isDirectory) f.listFiles().foreach(deleteRecursively)
    f.delete(): Unit
  }

  /** Root directory for generated benchmark datasets. */
  def dataRoot: String = {
    val d = new File(sys.props.getOrElse("repro.dataDir", "target/benchdata"))
    d.mkdirs()
    d.getAbsolutePath
  }
}
