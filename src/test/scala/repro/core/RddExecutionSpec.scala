package repro.core

import repro.core.model._
import repro.core.runtime.DynamicContext

/** RDD-based execution of expression iterators (paper §4.1, §5.6): Spark
  * transformations for navigation/predicates, Spark actions for
  * aggregations, and the seamless local↔RDD switching of §5.5. */
class RddExecutionSpec extends RumbleSpec {

  test("parallelize produces an RDD-backed sequence") {
    val it = rumble.compile("parallelize(1 to 100)")
    assert(it.isRDD(DynamicContext.root(repro.core.runtime.RumbleConf())))
    assert(rumble.run("count(parallelize(1 to 100))") == List(IntItem(100)))
  }

  test("forced-local engine never uses RDDs") {
    val it = rumbleLocal.compile("parallelize(1 to 10)")
    assert(!it.isRDD(DynamicContext.root(
      repro.core.runtime.RumbleConf(forceLocal = true))))
  }

  test("object lookup maps to a flatMap on the RDD") {
    assert(evalSpark(
      "parallelize(({\"a\": 1}, {\"a\": 2}, {\"b\": 9})).a") == "1, 2")
  }

  test("array unbox on the RDD path") {
    assert(evalSpark("parallelize(([1, 2], [3], 4))[]") == "1, 2, 3")
  }

  test("array lookup on the RDD path") {
    assert(evalSpark("parallelize(([10, 20], [30, 40]))[[2]]") == "20, 40")
  }

  test("predicate filter on the RDD path") {
    assert(evalSpark("parallelize(1 to 10)[$$ mod 3 eq 0]") == "3, 6, 9")
  }

  test("positional predicate on the RDD path is rejected") {
    // the dynamic error is raised inside the Spark task and surfaces
    // wrapped in the job-failure exception
    val e = intercept[Exception](rumble.run("parallelize(1 to 10)[3]"))
    def messages(t: Throwable): List[String] =
      if (t == null) Nil else t.getMessage :: messages(t.getCause)
    assert(messages(e).exists(m => m != null && m.contains("RBML0002")))
  }

  test("count/sum/avg/min/max as Spark actions") {
    assert(evalSpark("count(parallelize(1 to 1000))") == "1000")
    assert(evalSpark("sum(parallelize(1 to 100))") == "5050.0")
    assert(evalSpark("avg(parallelize(1 to 100))") == "50.5")
    assert(evalSpark("min(parallelize((5, 3, 9)))") == "3")
    assert(evalSpark("max(parallelize((5, 3, 9)))") == "9")
  }

  test("empty/exists as Spark actions") {
    assert(evalSpark("empty(parallelize(1 to 3))") == "false")
    assert(evalSpark("exists(parallelize(1 to 3))") == "true")
    assert(evalSpark("empty(parallelize(1 to 3)[$$ gt 99])") == "true")
  }

  test("distinct-values on the RDD path") {
    assert(rumble.run("distinct-values(parallelize((1, 2, 1, 3, 2)))")
      .toSet == Set(IntItem(1), IntItem(2), IntItem(3)))
  }

  test("chained navigation stays on the RDD without materializing") {
    val q = "parallelize(({\"a\": [1, 2]}, {\"a\": [3]}, {\"b\": [9]})).a[]"
    val it  = rumble.compile(q)
    val c   = DynamicContext.root(repro.core.runtime.RumbleConf())
    assert(it.isRDD(c))
    assert(it.getRDD(c).collect().toList == List(IntItem(1), IntItem(2), IntItem(3)))
  }

  test("json-file reads JSON lines as an RDD of items") {
    val path = tempJsonFile("rdd-json", Seq(
      """{"x": 1}""", """{"x": 2}""", "", """{"x": 3}"""))
    assert(evalSpark(s"""json-file("$path").x""") == "1, 2, 3")
  }

  test("json-file honors an explicit partition count") {
    val path = tempJsonFile("rdd-json-parts", (1 to 20).map(i => s"""{"x": $i}"""))
    val it = rumble.compile(s"""json-file("$path", 4)""")
    val c  = DynamicContext.root(repro.core.runtime.RumbleConf())
    assert(it.getRDD(c).getNumPartitions >= 4)
    assert(it.getRDD(c).count() == 20)
  }

  test("local API over an RDD-backed expression collects seamlessly (§5.5)") {
    // run() uses the local API; the RDD is collected behind the scenes
    assert(rumble.run("parallelize((\"a\", \"b\"))") ==
      List(StringItem("a"), StringItem("b")))
  }

  test("heterogeneous RDD of items (mixed kinds in one sequence)") {
    assert(evalSpark("count(parallelize((1, \"a\", null, [1], {\"k\": 2})))") == "5")
  }

  test("for+where+return FLWORs compile to the Fig. 9 RDD fast path") {
    val it = rumble.compile(
      "for $x in parallelize(1 to 100) where $x mod 2 eq 0 return $x")
    assert(it.isInstanceOf[repro.core.runtime.flwor.SimpleFlworRddIterator])
    assert(rumble.runCount(
      "for $x in parallelize(1 to 100) where $x mod 2 eq 0 return $x") == 50)
    // a let clause forces the general tuple-stream (DataFrame) path
    val it2 = rumble.compile(
      "for $x in parallelize(1 to 10) let $y := $x where $y gt 5 return $y")
    assert(it2.isInstanceOf[repro.core.runtime.flwor.FlworIterator])
  }

  test("fast-path FLWOR matches the general path's semantics") {
    val fast = rumble.run(
      "for $x in parallelize(1 to 20) where $x mod 3 eq 0 return $x * 10")
    val general = rumble.run(
      "for $x in parallelize(1 to 20) let $k := $x where $k mod 3 eq 0 return $k * 10")
    assert(fast == general)
    // multi-item and empty returns flow through flatMap correctly
    assert(evalSpark(
      "for $x in parallelize(1 to 3) where $x ge 2 return ($x, $x)") == "2, 2, 3, 3")
    assert(evalSpark(
      "for $x in parallelize(1 to 3) where $x ge 2 return ()") == "")
  }

  test("comma over RDD children unions the RDDs") {
    val q  = "(parallelize(1 to 3), parallelize(4 to 6))"
    val it = rumble.compile(q)
    val c  = DynamicContext.root(repro.core.runtime.RumbleConf())
    assert(it.isRDD(c))
    assert(it.getRDD(c).count() == 6)
  }
}
