package repro.datasets

import java.io.File
import org.apache.spark.sql.SparkSession
import scala.util.Random

/** Messy datasets in the shape of the paper's Fig. 5 and Fig. 7: fields
  * whose values are "95% of the time" one type but occasionally absent,
  * null, or of a different type — the inputs Spark SQL forces into strings
  * (Fig. 6) but JSONiq handles natively (§3.4).
  */
object HeterogeneousData {

  /** Fig. 5 shape: `foo` always a string, `bar` number | array | string,
    * `foobar` boolean | string | absent. */
  def fig5Line(i: Long, seed: Long): String = {
    val rng = new Random(seed ^ (i * 0xA24BAED4963EE407L))
    val bar = rng.nextInt(3) match {
      case 0 => (2 + i % 10).toString
      case 1 => s"[${4 + i % 10}]"
      case 2 => "\"" + (6 + i % 10) + "\""
    }
    val foobar = rng.nextInt(3) match {
      case 0 => s""", "foobar": ${i % 2 == 0}"""
      case 1 => s""", "foobar": "${i % 2 != 0}""""
      case 2 => ""
    }
    s"""{"foo": "${i + 1}", "bar": $bar$foobar}"""
  }

  /** Fig. 7 shape: `country` is usually a string, sometimes an array of
    * strings, sometimes null, sometimes absent; `value` is a number. */
  def fig7Line(i: Long, seed: Long): String = {
    val rng       = new Random(seed ^ (i * 0x9FB21C651E98DF25L))
    val countries = ConfusionData.countries
    val c         = countries(rng.nextInt(countries.size))
    val country = rng.nextInt(20) match {
      case 0     => s"""["$c", "${countries(rng.nextInt(countries.size))}"]"""
      case 1     => "null"
      case 2     => null // absent
      case _     => "\"" + c + "\""
    }
    val head = s"""{"value": ${1 + rng.nextInt(100)}"""
    if (country == null) head + "}" else head + s""", "country": $country}"""
  }

  def generateFig7(spark: SparkSession, path: String, n: Long,
                   partitions: Int = 8, seed: Long = 11): String = {
    if (new File(path, "_SUCCESS").exists()) return path
    val s = seed
    spark.sparkContext.range(0L, n, numSlices = partitions)
      .map(i => fig7Line(i, s))
      .saveAsTextFile(path)
    path
  }

  def generateFig5LocalFile(path: String, n: Long, seed: Long = 12): String = {
    val f = new File(path)
    if (f.exists() && f.length() > 0) return path
    f.getParentFile.mkdirs()
    val w = new java.io.BufferedWriter(new java.io.FileWriter(f))
    var i = 0L
    while (i < n) { w.write(fig5Line(i, seed)); w.write("\n"); i += 1 }
    w.close()
    path
  }
}
