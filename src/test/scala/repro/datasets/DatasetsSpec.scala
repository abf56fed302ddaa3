package repro.datasets

import repro.core.RumbleSpec
import repro.core.json.JsonParser
import repro.core.model._

/** Generator sanity: determinism, parseability, and the distributional
  * properties the experiments depend on (documented in DESIGN.md). */
class DatasetsSpec extends RumbleSpec {

  test("confusion lines are deterministic in (i, seed)") {
    assert(ConfusionData.line(7, 42) == ConfusionData.line(7, 42))
    assert(ConfusionData.line(7, 42) != ConfusionData.line(8, 42))
    assert(ConfusionData.line(7, 42) != ConfusionData.line(7, 43))
  }

  test("confusion lines parse and have the Fig. 1 schema") {
    (0 until 500).foreach { i =>
      val o = JsonParser.parse(ConfusionData.line(i.toLong, 1L))
      assert(o.isObject)
      assert(o.lookup("guess").exists(_.isString))
      assert(o.lookup("target").exists(_.isString))
      assert(o.lookup("country").exists(_.isString))
      assert(o.lookup("choices").exists(_.isArray))
      assert(o.lookup("sample").exists(_.isString))
      assert(o.lookup("date").exists(_.stringValue.matches("\\d{4}-\\d{2}-\\d{2}")))
    }
  }

  test("confusion: the guess is always among the choices' language domain") {
    (0 until 300).foreach { i =>
      val o = JsonParser.parse(ConfusionData.line(i.toLong, 1L))
      assert(ConfusionData.languages.contains(o.lookup("guess").get.stringValue))
      assert(o.lookup("choices").get.arrayValues.forall(c =>
        ConfusionData.languages.contains(c.stringValue)))
    }
  }

  test("confusion: guess = target selectivity is in the modeled band") {
    val n = 5000
    val hits = (0 until n).count { i =>
      val o = JsonParser.parse(ConfusionData.line(i.toLong, 42L))
      o.lookup("guess") == o.lookup("target")
    }
    val ratio = hits.toDouble / n
    assert(ratio > 0.6 && ratio < 0.9, s"selectivity $ratio outside [0.6, 0.9]")
  }

  test("confusion: target languages are skewed (head heavier than tail)") {
    val n = 5000
    val counts = (0 until n)
      .map(i => JsonParser.parse(ConfusionData.line(i.toLong, 42L))
        .lookup("target").get.stringValue)
      .groupBy(identity).view.mapValues(_.size)
    val head = ConfusionData.languages.take(5).map(l => counts.getOrElse(l, 0)).sum
    val tail = ConfusionData.languages.takeRight(5).map(l => counts.getOrElse(l, 0)).sum
    assert(head > tail * 2, s"head=$head tail=$tail")
  }

  test("confusion generateLocalFile writes n parseable lines and is idempotent") {
    val path = new java.io.File(
      java.nio.file.Files.createTempDirectory("ds").toFile, "c.json").getAbsolutePath
    ConfusionData.generateLocalFile(path, 200)
    val lines = scala.io.Source.fromFile(path).getLines().toList
    assert(lines.size == 200)
    lines.foreach(l => JsonParser.parse(l))
    val len = new java.io.File(path).length()
    ConfusionData.generateLocalFile(path, 200) // no rewrite
    assert(new java.io.File(path).length() == len)
  }

  test("confusion generate (Spark) writes a readable JSON-Lines directory") {
    val dir = java.nio.file.Files.createTempDirectory("ds-spark").resolve("conf").toString
    ConfusionData.generate(spark, dir, 1000, partitions = 4)
    assert(rumble.runCount(s"""json-file("$dir")""") == 1000)
  }

  test("reddit lines parse and have the expected fields") {
    (0 until 300).foreach { i =>
      val o = JsonParser.parse(RedditData.line(i.toLong, 7L))
      assert(o.lookup("author").exists(_.isString))
      assert(o.lookup("subreddit").exists(_.isString))
      assert(o.lookup("body").exists(_.isString))
      assert(o.lookup("score").exists(_.isInteger))
      assert(o.lookup("created_utc").exists(_.isInteger))
    }
  }

  test("reddit: score >= 1000 is a highly filtering predicate") {
    val n = 20000
    val hits = (0 until n).count { i =>
      JsonParser.parse(RedditData.line(i.toLong, 7L))
        .lookup("score").get.numericDouble >= 1000
    }
    val sel = hits.toDouble / n
    assert(sel < 0.02, s"selectivity $sel not highly filtering")
    assert(hits > 0, "predicate should still match something at bench sizes")
  }

  test("fig5 lines exhibit heterogeneous bar/foobar types") {
    val items = (0 until 300).map(i => JsonParser.parse(HeterogeneousData.fig5Line(i.toLong, 12L)))
    assert(items.exists(_.lookup("bar").exists(_.isNumeric)))
    assert(items.exists(_.lookup("bar").exists(_.isArray)))
    assert(items.exists(_.lookup("bar").exists(_.isString)))
    assert(items.exists(_.lookup("foobar").exists(_.isBoolean)))
    assert(items.exists(_.lookup("foobar").isEmpty))
  }

  test("fig7 lines: country is string | array | null | absent") {
    val items = (0 until 500).map(i => JsonParser.parse(HeterogeneousData.fig7Line(i.toLong, 11L)))
    assert(items.count(_.lookup("country").exists(_.isString)) > 300)
    assert(items.exists(_.lookup("country").exists(_.isArray)))
    assert(items.exists(_.lookup("country").contains(NullItem)))
    assert(items.exists(_.lookup("country").isEmpty))
    assert(items.forall(_.lookup("value").exists(_.isNumeric)))
  }
}
