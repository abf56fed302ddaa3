package repro.core.model

import java.io._

/** Binary serde for sequences of items.
  *
  * FLWOR tuple streams are DataFrames with one BinaryType column per
  * in-scope variable (paper §4.3: "the type of every column is a List of
  * Items"). Each cell is the serialized *materialized sequence* bound to
  * that variable. A compact tag-based format is used instead of Java
  * serialization: cells are written/read billions of times in the group-by
  * and for-clause paths, so the serde is on the hot path.
  */
object ItemSerde {

  private final val TagNull    = 0
  private final val TagTrue    = 1
  private final val TagFalse   = 2
  private final val TagInt     = 3
  private final val TagDouble  = 4
  private final val TagDecimal = 5
  private final val TagString  = 6
  private final val TagArray   = 7
  private final val TagObject  = 8

  def serializeSeq(items: Seq[Item]): Array[Byte] = {
    val bos = new ByteArrayOutputStream(64)
    val out = new DataOutputStream(bos)
    out.writeInt(items.size)
    items.foreach(writeItem(out, _))
    out.flush()
    bos.toByteArray
  }

  def deserializeSeq(bytes: Array[Byte]): List[Item] = {
    if (bytes == null) return Nil
    val in = new DataInputStream(new ByteArrayInputStream(bytes))
    val n  = in.readInt()
    List.fill(n)(readItem(in))
  }

  def serializeItem(item: Item): Array[Byte]  = serializeSeq(Seq(item))

  private def writeItem(out: DataOutputStream, item: Item): Unit = item match {
    case NullItem           => out.writeByte(TagNull)
    case BooleanItem(true)  => out.writeByte(TagTrue)
    case BooleanItem(false) => out.writeByte(TagFalse)
    case IntItem(v)         => out.writeByte(TagInt); out.writeLong(v)
    case DoubleItem(v)      => out.writeByte(TagDouble); out.writeDouble(v)
    case DecimalItem(v)     => out.writeByte(TagDecimal); out.writeUTF(v.bigDecimal.toPlainString)
    case StringItem(s)      => out.writeByte(TagString); out.writeUTF(s)
    case ArrayItem(values)  =>
      out.writeByte(TagArray); out.writeInt(values.size)
      values.foreach(writeItem(out, _))
    case ObjectItem(fields) =>
      out.writeByte(TagObject); out.writeInt(fields.size)
      fields.foreach { case (k, v) => out.writeUTF(k); writeItem(out, v) }
  }

  private def readItem(in: DataInputStream): Item = in.readByte() match {
    case TagNull    => NullItem
    case TagTrue    => BooleanItem(true)
    case TagFalse   => BooleanItem(false)
    case TagInt     => IntItem(in.readLong())
    case TagDouble  => DoubleItem(in.readDouble())
    case TagDecimal => DecimalItem(BigDecimal(in.readUTF()))
    case TagString  => StringItem(in.readUTF())
    case TagArray   =>
      val n = in.readInt()
      ArrayItem(Vector.fill(n)(readItem(in)))
    case TagObject  =>
      val n = in.readInt()
      ObjectItem(Vector.fill(n)((in.readUTF(), readItem(in))))
    case other => throw new RumbleException("SERDE", s"bad tag $other")
  }
}
