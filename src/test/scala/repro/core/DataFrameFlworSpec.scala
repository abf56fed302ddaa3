package repro.core

import repro.core.model._
import repro.core.runtime.{DynamicContext, RumbleConf}

/** FLWOR execution on DataFrames (paper §4.3–4.10, §5.8): tuple streams as
  * all-binary DataFrames, clauses as DataFrame operations. Each query is
  * checked to actually take the DataFrame path (isRDD on the root FLWOR)
  * and to agree with the forced-local engine. */
class DataFrameFlworSpec extends RumbleSpec {

  /** Assert the FLWOR root is Spark-backed, then compare both engines. */
  private def checkAgainstLocal(query: String, ordered: Boolean = true): Unit = {
    val it = rumble.compile(query)
    assert(it.isRDD(DynamicContext.root(RumbleConf())), s"expected DataFrame path for: $query")
    val sparkRes = rumble.run(query)
    val localRes = rumbleLocal.run(localized(query))
    if (ordered) assert(ser(sparkRes) == ser(localRes))
    else assert(sparkRes.map(i => repro.core.json.JsonWriter.write(i)).sorted ==
                localRes.map(i => repro.core.json.JsonWriter.write(i)).sorted)
  }

  /** The local engine sees the same query (parallelize degrades locally). */
  private def localized(q: String): String = q

  test("initial for over an RDD creates the one-column DataFrame (§4.4)") {
    checkAgainstLocal("for $x in parallelize(1 to 50) return $x")
  }

  test("for + where on the DataFrame path (§4.6)") {
    checkAgainstLocal("for $x in parallelize(1 to 100) where $x mod 10 eq 0 return $x")
  }

  test("let as extended projection (§4.5)") {
    checkAgainstLocal(
      "for $x in parallelize(1 to 10) let $y := $x * $x where $y ge 50 return $y")
  }

  test("non-initial for explodes (§4.4)") {
    checkAgainstLocal(
      "for $x in parallelize(1 to 3) for $y in 1 to $x return 10 * $x + $y")
  }

  test("non-initial for over an empty sequence drops the tuple") {
    checkAgainstLocal(
      "for $x in parallelize((1, 2, 3)) for $y in $x[$$ ge 2] return $y")
  }

  test("variable redeclaration drops the shadowed column (§4.5)") {
    checkAgainstLocal(
      "for $x in parallelize(1 to 5) let $x := $x * 2 return $x")
  }

  test("count clause via zipWithIndex (§4.9)") {
    checkAgainstLocal("for $x in parallelize((\"a\", \"b\", \"c\")) count $c return $c")
    checkAgainstLocal(
      "for $x in parallelize(20 to 40) where $x mod 2 eq 0 count $c return $c * 100 + $x")
  }

  test("order by on the DataFrame path (§4.8)") {
    checkAgainstLocal("for $x in parallelize((3, 1, 2, 5, 4)) order by $x return $x")
    checkAgainstLocal(
      "for $x in parallelize((3, 1, 2)) order by $x descending return $x")
  }

  test("order by strings, multiple keys, mixed directions") {
    checkAgainstLocal(
      """for $x in parallelize(({"a": "x", "b": 2}, {"a": "x", "b": 1}, {"a": "w", "b": 9}))
        |order by $x.a ascending, $x.b descending
        |return $x.b""".stripMargin)
  }

  test("order by with empty keys: least by default, greatest on request") {
    checkAgainstLocal(
      """for $x in parallelize(({"k": 2}, {}, {"k": 1}))
        |order by $x.k
        |return size([$x.k])""".stripMargin)
    checkAgainstLocal(
      """for $x in parallelize(({"k": 2}, {}, {"k": 1}))
        |order by $x.k empty greatest
        |return size([$x.k])""".stripMargin)
  }

  test("order by null sorts below values (DataFrame path)") {
    checkAgainstLocal(
      "for $x in parallelize((2, null, 1)) order by $x return $x")
  }

  test("order by type check fails on mixed types (first pass, §4.8)") {
    expectError("for $x in parallelize((1, \"a\")) order by $x return $x",
      "XPTY0004")(rumble.run)
  }

  test("group by with count aggregation (§4.7 COUNT pushdown)") {
    checkAgainstLocal(
      """for $x in parallelize((1, 2, 1, 3, 1, 2))
        |group by $k := $x
        |order by $k
        |return {"k": $k, "n": count($x)}""".stripMargin)
  }

  test("group by materializing the non-grouping variable (§4.7 SEQUENCE)") {
    checkAgainstLocal(
      """for $x in parallelize(({"a": 1, "b": 10}, {"a": 2, "b": 20}, {"a": 1, "b": 30}))
        |group by $k := $x.a
        |order by $k
        |return {"k": $k, "s": sum($x.b)}""".stripMargin)
  }

  test("group by dropping an unused variable (§4.7)") {
    checkAgainstLocal(
      """for $x in parallelize((5, 6, 5))
        |group by $k := $x
        |order by $k
        |return $k""".stripMargin)
  }

  test("group by heterogeneous keys (strings, numbers, null, empty)") {
    checkAgainstLocal(
      """for $x in parallelize(({"c": "US"}, {"c": 1}, {"c": "US"}, {"c": null}, {}))
        |group by $k := $x.c
        |return {"n": count($x)}""".stripMargin, ordered = false)
  }

  test("group by multiple keys") {
    checkAgainstLocal(
      """for $x in parallelize(({"a": 1, "b": "u"}, {"a": 1, "b": "v"}, {"a": 1, "b": "u"}))
        |group by $ka := $x.a, $kb := $x.b
        |order by $kb
        |return {"a": $ka, "b": $kb, "n": count($x)}""".stripMargin)
  }

  test("integer 1 and double 1.0 group together (value-based key encoding)") {
    checkAgainstLocal(
      """for $x in parallelize((1, 1.0, 2))
        |group by $k := $x
        |order by $k
        |return count($x)""".stripMargin)
  }

  test("return constructing objects (§4.10)") {
    checkAgainstLocal(
      """for $x in parallelize(1 to 5)
        |return {"v": $x, "sq": $x * $x}""".stripMargin)
  }

  test("FLWOR result feeds parent expressions as an RDD (§4.10)") {
    assert(evalSpark(
      "count(for $x in parallelize(1 to 500) where $x mod 2 eq 0 return $x)") == "250")
  }

  test("group then order then count clause, all on DataFrames") {
    checkAgainstLocal(
      """for $x in parallelize((3, 1, 3, 2, 3, 2))
        |group by $k := $x
        |order by count($x) descending, $k ascending
        |count $rank
        |return {"rank": $rank, "k": $k}""".stripMargin)
  }

  test("json-file FLWOR end-to-end over a file") {
    val path = tempJsonFile("df-flwor", Seq(
      """{"guess": "French", "target": "French", "country": "AU"}""",
      """{"guess": "German", "target": "Danish", "country": "US"}""",
      """{"guess": "Swedish", "target": "Swedish", "country": "AU"}"""))
    val q =
      s"""for $$i in json-file("$path")
         |where $$i.guess eq $$i.target
         |return $$i.country""".stripMargin
    assert(rumble.run(q) == List(StringItem("AU"), StringItem("AU")))
    assert(rumble.runCount(q) == 2)
  }

  test("initial let stays local (paper §4.5)") {
    val it = rumble.compile("let $x := parallelize(1 to 3) return count($x)")
    assert(!it.isRDD(DynamicContext.root(RumbleConf())))
    assert(evalSpark("let $x := parallelize(1 to 3) return count($x)") == "3")
  }

  test("nested FLWOR inside a closure runs through the local API (§5.6)") {
    checkAgainstLocal(
      """for $x in parallelize(1 to 4)
        |let $s := sum(for $y in 1 to $x return $y * $y)
        |return $s""".stripMargin)
  }

  test("writeJsonLines writes the RDD result back in parallel (§5.4)") {
    val out = new java.io.File(
      java.nio.file.Files.createTempDirectory("rumble-out").toFile, "res").getAbsolutePath
    rumble.writeJsonLines(
      "for $x in parallelize(1 to 10) where $x gt 7 return {\"v\": $x}", out)
    val back = rumble.run(s"""json-file("$out").v""")
    assert(back.map(_.numericDouble).toSet == Set(8.0, 9.0, 10.0))
  }
}
