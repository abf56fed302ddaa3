package repro.core.flwor

import org.scalatest.funsuite.AnyFunSuite
import repro.core.model._
import repro.core.runtime.{DynamicContext, RumbleConf}
import repro.core.runtime.flwor.{FlworTuple, KeyEncoder, TupleSchema}

/** Unit tests for the tuple-stream schema machinery (paper §4.3) and the
  * group/order key encoders (§4.7–4.8). */
class TupleSchemaSpec extends AnyFunSuite {

  test("withVar assigns fresh sanitized column names") {
    val (s1, c1) = TupleSchema.empty.withVar("my-var")
    assert(c1 == "v0_my_var")
    assert(s1.vars == Vector("my-var"))
    val (s2, c2) = s1.withVar("x")
    assert(c2 == "v1_x")
    assert(s2.cols == Vector("v0_my_var", "v1_x"))
  }

  test("rebinding a variable drops the shadowed column (paper §4.5)") {
    val (s1, _)  = TupleSchema.empty.withVar("x")
    val (s2, _)  = s1.withVar("y")
    val (s3, c3) = s2.withVar("x")
    assert(s3.vars == Vector("y", "x"))
    assert(c3 == "v2_x")
    assert(s3.colOf("x") == "v2_x")
  }

  test("similar names cannot collide (fresh ids disambiguate)") {
    val (s1, c1) = TupleSchema.empty.withVar("a-b")
    val (s2, c2) = s1.withVar("a_b")
    assert(c1 != c2)
    assert(s2.vars.size == 2)
  }

  test("structType is all-binary") {
    val (s, _) = TupleSchema.empty.withVar("x")
    assert(s.structType.fields.forall(_.dataType ==
      org.apache.spark.sql.types.BinaryType))
  }

  test("colOf on a missing variable fails") {
    assertThrows[IllegalStateException](TupleSchema.empty.colOf("x"))
  }

  test("rowFromTuple/contextFromRow round-trip") {
    val (s1, _) = TupleSchema.empty.withVar("a")
    val (s, _)  = s1.withVar("b")
    val t = FlworTuple(Map("a" -> List(IntItem(1), IntItem(2)), "b" -> List(StringItem("x"))))
    val row  = TupleSchema.rowFromTuple(t, s)
    val base = DynamicContext.root(RumbleConf()).enterClosure
    val ctx  = TupleSchema.contextFromRow(row, s, base)
    assert(ctx.lookupOrFail("a") == List(IntItem(1), IntItem(2)))
    assert(ctx.lookupOrFail("b") == List(StringItem("x")))
  }

  test("missing bindings serialize as empty sequences") {
    val (s, _) = TupleSchema.empty.withVar("a")
    val row = TupleSchema.rowFromTuple(FlworTuple.empty, s)
    assert(ItemSerde.deserializeSeq(row.getAs[Array[Byte]](0)) == Nil)
  }

  test("group key encoding matches the paper's column design (§4.7)") {
    assert(KeyEncoder.encodeGroup(Nil) == ((1, "", 0.0)))
    assert(KeyEncoder.encodeGroup(List(NullItem)) == ((2, "", 0.0)))
    assert(KeyEncoder.encodeGroup(List(BooleanItem(true))) == ((3, "", 0.0)))
    assert(KeyEncoder.encodeGroup(List(BooleanItem(false))) == ((4, "", 0.0)))
    assert(KeyEncoder.encodeGroup(List(StringItem("s"))) == ((5, "s", 0.0)))
    assert(KeyEncoder.encodeGroup(List(IntItem(3))) == ((6, "", 3.0)))
    assert(KeyEncoder.encodeGroup(List(DoubleItem(3.0))) == ((6, "", 3.0)))
  }

  test("order key encoding distinguishes empty least/greatest (§4.8)") {
    assert(KeyEncoder.encodeOrder(Nil, emptyGreatest = false)._1 == 0)
    assert(KeyEncoder.encodeOrder(Nil, emptyGreatest = true)._1 == 9)
    assert(KeyEncoder.encodeOrder(List(StringItem("a")), false) == ((4, "a", 0.0)))
    assert(KeyEncoder.encodeOrder(List(IntItem(2)), false) == ((5, "", 2.0)))
  }

  test("checkOrderRanks accepts compatible, rejects mixed") {
    KeyEncoder.checkOrderRanks(Seq(0, 1, 5), 0)       // empty, null, number
    KeyEncoder.checkOrderRanks(Seq(2, 3), 0)          // both booleans
    KeyEncoder.checkOrderRanks(Seq(9, 4), 0)          // empty-greatest + strings
    assertThrows[RumbleException](KeyEncoder.checkOrderRanks(Seq(4, 5), 0))
    assertThrows[RumbleException](KeyEncoder.checkOrderRanks(Seq(2, 5), 0))
  }

  test("dynamic context chains and shadows") {
    val root = DynamicContext.root(RumbleConf())
    val c1   = root.bind("x", List(IntItem(1)))
    val c2   = c1.bind("y", List(IntItem(2)))
    val c3   = c2.bind("x", List(IntItem(9)))
    assert(c2.lookupOrFail("x") == List(IntItem(1)))
    assert(c3.lookupOrFail("x") == List(IntItem(9)))
    assert(c3.lookupOrFail("y") == List(IntItem(2)))
    assertThrows[RumbleException](root.lookupOrFail("x"))
  }

  test("enterClosure marks executor-side contexts") {
    val root = DynamicContext.root(RumbleConf())
    assert(!root.insideClosure)
    assert(root.enterClosure.insideClosure)
    assert(root.enterClosure.bind("x", Nil).insideClosure)
  }
}
