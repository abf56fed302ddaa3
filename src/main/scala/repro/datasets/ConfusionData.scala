package repro.datasets

import java.io.File
import org.apache.spark.sql.SparkSession
import scala.util.Random

/** Synthetic stand-in for the Great Language Game "confusion" dataset
  * (paper §6.1, Fig. 1): JSON-Lines objects
  * `{guess, target, country, choices[], sample, date}`.
  *
  * The real 2.9 GB / 16M-object download is unavailable offline; this
  * generator preserves the properties the experiments exercise:
  *  - per-object JSON parse cost (~185 bytes/object, like the original);
  *  - `guess = target` selectivity ≈ 0.72 (players are usually right);
  *  - group-by key `target` with a small (~40) skewed language domain;
  *  - sort keys `target, country, date` with realistic cardinalities.
  *
  * Deterministic in (n, seed): record i is generated from Random(seed ^ i).
  */
object ConfusionData {

  val languages: Vector[String] = Vector(
    "French", "German", "Spanish", "Italian", "Portuguese", "Dutch", "Swedish",
    "Danish", "Norwegian", "Finnish", "Russian", "Polish", "Czech", "Slovak",
    "Ukrainian", "Bulgarian", "Serbian", "Croatian", "Romanian", "Hungarian",
    "Greek", "Turkish", "Arabic", "Hebrew", "Hindi", "Bengali", "Tamil",
    "Thai", "Vietnamese", "Khmer", "Burmese", "Mandarin", "Cantonese",
    "Japanese", "Korean", "Indonesian", "Malay", "Tagalog", "Swahili", "Zulu")

  val countries: Vector[String] = Vector(
    "US", "GB", "AU", "CA", "DE", "FR", "NL", "SE", "NO", "DK", "FI", "PL",
    "RU", "BR", "IN", "CN", "JP", "KR", "ES", "IT", "PT", "MX", "AR", "ZA",
    "NZ", "IE", "CH", "AT", "BE", "CZ")

  /** One JSON-Lines record, deterministic in (seed, i). */
  def line(i: Long, seed: Long): String = {
    val rng = new Random(seed ^ (i * 0x9E3779B97F4A7C15L))
    // skewed language popularity: quadratic bias towards the head
    def pickLang(): String = {
      val u = rng.nextDouble()
      languages((u * u * languages.size).toInt.min(languages.size - 1))
    }
    val target    = pickLang()
    val nChoices  = 2 + rng.nextInt(3)
    val wrong     = Vector.fill(nChoices - 1)(pickLang())
    val choices   = rng.shuffle(wrong :+ target).distinct
    val guess     = if (rng.nextDouble() < 0.72) target
                    else choices(rng.nextInt(choices.size))
    val country   = countries(rng.nextInt(countries.size))
    val sample    = f"${rng.nextLong()}%016x${rng.nextLong()}%016x"
    val day       = rng.nextInt(730)
    val date      = java.time.LocalDate.of(2013, 1, 1).plusDays(day.toLong).toString
    val cs        = choices.map(c => "\"" + c + "\"").mkString(", ")
    s"""{"guess": "$guess", "target": "$target", "country": "$country", """ +
      s""""choices": [$cs], "sample": "$sample", "date": "$date"}"""
  }

  /** Generate `n` objects as a JSON-Lines directory at `path` (parallel,
    * deterministic). Returns the path. Skips generation if already there. */
  def generate(spark: SparkSession, path: String, n: Long,
               partitions: Int = 16, seed: Long = 42): String = {
    if (new File(path, "_SUCCESS").exists()) return path
    val s = seed
    spark.sparkContext
      .range(0L, n, numSlices = partitions)
      .map(i => line(i, s))
      .saveAsTextFile(path)
    path
  }

  /** Generate a single local JSON-Lines *file* (for the single-threaded
    * engine comparison, where input is one file as in the paper). */
  def generateLocalFile(path: String, n: Long, seed: Long = 42): String = {
    val f = new File(path)
    if (f.exists() && f.length() > 0) return path
    f.getParentFile.mkdirs()
    val w = new java.io.BufferedWriter(new java.io.FileWriter(f), 1 << 20)
    var i = 0L
    while (i < n) { w.write(line(i, seed)); w.write("\n"); i += 1 }
    w.close()
    path
  }
}
