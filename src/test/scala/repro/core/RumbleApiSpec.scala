package repro.core

import repro.core.model._

/** Tests for the public façade: result shapes, runCount on both paths,
  * DataFrame conversion typing for the oracle. */
class RumbleApiSpec extends RumbleSpec {

  test("run materializes; runIterator streams") {
    assert(rumble.run("1 to 3") == List(IntItem(1), IntItem(2), IntItem(3)))
    val it = rumble.runIterator("1 to 1000")
    assert(it.take(2).toList == List(IntItem(1), IntItem(2)))
  }

  test("runCount without Spark (local path)") {
    assert(rumbleLocal.runCount("1 to 250") == 250)
    assert(rumbleLocal.runCount("()") == 0)
  }

  test("runCount with Spark (RDD count action)") {
    assert(rumble.runCount("for $x in parallelize(1 to 500) where $x mod 5 eq 0 return $x")
      == 100)
  }

  test("runToRdd on a local result parallelizes it") {
    assert(rumble.runToRdd("(1, 2, 3)").count() == 3)
  }

  test("runToDataFrame infers Long, Double, Boolean, String columns") {
    val df = rumble.runToDataFrame(
      """for $i in (1, 2)
        |return {"l": $i, "d": $i * 1.5, "b": $i eq 1, "s": "v" || $i}""".stripMargin)
    val types = df.schema.fields.map(f => f.name -> f.dataType.typeName).toMap
    assert(types("l") == "long")
    assert(types("d") == "double")
    assert(types("b") == "boolean")
    assert(types("s") == "string")
    assert(df.count() == 2)
  }

  test("runToDataFrame: missing fields and nulls become SQL NULLs") {
    val df = rumble.runToDataFrame("""({"a": 1, "b": null}, {"a": 2})""")
    val rows = df.collect().sortBy(_.getLong(0))
    assert(rows.forall(_.isNullAt(1)))
  }

  test("runToDataFrame: mixed-type columns fall back to strings") {
    val df = rumble.runToDataFrame("""({"a": 1}, {"a": "x"})""")
    assert(df.schema.fields.head.dataType.typeName == "string")
    assert(df.collect().map(_.getString(0)).toSet == Set("1", "x"))
  }

  test("runToDataFrame rejects non-object items") {
    val e = intercept[RumbleException](rumble.runToDataFrame("(1, 2)"))
    assert(e.code == "RBML0003")
  }

  test("compile is reusable and side-effect free") {
    val it  = rumble.compile("1 + 1")
    val ctx = repro.core.runtime.DynamicContext.root(
      repro.core.runtime.RumbleConf())
    assert(it.materialize(ctx) == List(IntItem(2)))
    assert(it.materialize(ctx) == List(IntItem(2)))
  }

  test("pull API contract: open/hasNext/next/reset/close (§5.5)") {
    val it  = rumbleLocal.compile("(10, 20)")
    val ctx = repro.core.runtime.DynamicContext.root(
      repro.core.runtime.RumbleConf(forceLocal = true))
    it.open(ctx)
    assert(it.hasNext)
    assert(it.next() == IntItem(10))
    assert(it.next() == IntItem(20))
    assert(!it.hasNext)
    it.reset(ctx)
    assert(it.next() == IntItem(10))
    it.close()
  }

  test("materialization cap warns but does not fail (§5.5)") {
    val r = new Rumble(spark, repro.core.runtime.RumbleConf(materializationCap = 10))
    assert(r.run("parallelize(1 to 100)").size == 100)
  }

  test("engine name and heap model flow through the conf") {
    val r = new Rumble(spark, repro.core.runtime.RumbleConf(
      forceLocal = true, heapModelCap = Some(5), engineName = "tiny"))
    val e = intercept[HeapModelExceeded](
      r.run("for $x in (1,2,3,4,5,6,7) order by $x return $x"))
    assert(e.getMessage.contains("tiny"))
  }
}
