package repro.core.model

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import org.scalatest.funsuite.AnyFunSuite

/** Round-trip tests for the binary serde backing FLWOR DataFrame cells. */
class ItemSerdeSpec extends AnyFunSuite {

  private def rt(items: Seq[Item]): Unit =
    assert(ItemSerde.deserializeSeq(ItemSerde.serializeSeq(items)) == items.toList)

  test("empty sequence") { rt(Nil) }

  test("atomics") {
    rt(Seq(IntItem(0), IntItem(Long.MaxValue), IntItem(Long.MinValue)))
    rt(Seq(DoubleItem(1.5), DoubleItem(Double.MaxValue), DoubleItem(-0.0)))
    rt(Seq(DecimalItem(BigDecimal("123456789.123456789"))))
    rt(Seq(StringItem(""), StringItem("héllo wörld"), StringItem("a\nb\tc")))
    rt(Seq(BooleanItem(true), BooleanItem(false), NullItem))
  }

  test("structured items") {
    rt(Seq(ArrayItem(Vector(IntItem(1), StringItem("x"), NullItem))))
    rt(Seq(ObjectItem(Vector("a" -> IntItem(1), "b" -> ArrayItem(Vector(NullItem))))))
    rt(Seq(ObjectItem(Vector.empty), ArrayItem(Vector.empty)))
  }

  test("deeply nested") {
    val deep = (1 to 50).foldLeft(IntItem(0): Item)((acc, _) => ArrayItem(Vector(acc)))
    rt(Seq(deep))
  }

  test("long heterogeneous sequence") {
    rt((1 to 1000).map(i => if (i % 2 == 0) IntItem(i.toLong) else StringItem(s"s$i")))
  }

  test("serializeItem is a singleton sequence") {
    assert(ItemSerde.deserializeSeq(ItemSerde.serializeItem(IntItem(7))) == List(IntItem(7)))
  }

  test("null bytes deserialize to empty") {
    assert(ItemSerde.deserializeSeq(null) == Nil)
  }

  test("sequence length is readable from the header") {
    val bytes = ItemSerde.serializeSeq(Seq(IntItem(1), IntItem(2), IntItem(3)))
    assert(java.nio.ByteBuffer.wrap(bytes).getInt == 3)
  }

  test("property: random items round-trip") {
    val atom: Gen[Item] = Gen.oneOf(
      Gen.choose(Long.MinValue, Long.MaxValue).map(IntItem.apply),
      Gen.choose(-1e12, 1e12).map(DoubleItem.apply),
      Gen.asciiPrintableStr.map(StringItem.apply),
      Gen.oneOf(BooleanItem(true), BooleanItem(false), NullItem))
    def g(d: Int): Gen[Item] =
      if (d == 0) atom
      else Gen.frequency(
        4 -> atom,
        1 -> Gen.listOfN(4, g(d - 1)).map(l => ArrayItem(l.toVector)),
        1 -> Gen.listOfN(4, Gen.zip(Gen.alphaNumStr, g(d - 1)))
          .map(l => ObjectItem(l.toVector)))
    (1 to 200).foreach { i =>
      Gen.listOfN(5, g(2)).apply(Gen.Parameters.default, Seed(i.toLong)).foreach(rt)
    }
  }
}
