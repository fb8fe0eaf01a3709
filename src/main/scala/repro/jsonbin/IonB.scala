package repro.jsonbin

import java.nio.charset.StandardCharsets.UTF_8
import repro.core.{ByteReader, ByteWriter}

/** Amazon-Ion-style binary JSON serializer ("Ion-B" in Tables 6–7).
  *
  * Type-tagged binary encoding with an optional shared key symbol table:
  *  - record mode (no table): keys are inlined — self-contained records,
  *    matching how Ion binary behaves without a shared symbol table;
  *  - file mode: a key symbol table built over the corpus is emitted
  *    once, records reference symbol ids (Ion's local symbol tables).
  *
  * Tags: 0 null, 1 false, 2 true, 3 int (zigzag varint),
  * 4 decimal (zigzag scale + zigzag unscaled), 5 string, 6 list, 7 struct.
  */
final class IonB(symbols: Option[Vector[String]]) extends Serializable {
  import J._

  private val symId: Map[String, Int] =
    symbols.map(_.zipWithIndex.toMap).getOrElse(Map.empty)

  private def writeStr(out: ByteWriter, s: String): Unit = {
    val b = s.getBytes(UTF_8)
    out.writeVarInt(b.length.toLong); out.writeBytes(b)
  }

  private def writeKey(out: ByteWriter, k: String): Unit =
    symbols match {
      case Some(_) => out.writeVarInt(symId(k).toLong)
      case None    => writeStr(out, k)
    }

  private def write(out: ByteWriter, j: J): Unit = j match {
    case JNull        => out.writeByte(0)
    case JBool(false) => out.writeByte(1)
    case JBool(true)  => out.writeByte(2)
    case JInt(v)      => out.writeByte(3); out.writeZigZag(v)
    case JDec(v) =>
      out.writeByte(4)
      out.writeZigZag(v.scale.toLong)
      out.writeZigZag(v.unscaledValue.longValueExact())
    case JStr(v) => out.writeByte(5); writeStr(out, v)
    case JArr(items) =>
      out.writeByte(6); out.writeVarInt(items.length.toLong)
      items.foreach(write(out, _))
    case JObj(fields) =>
      out.writeByte(7); out.writeVarInt(fields.length.toLong)
      fields.foreach { case (k, v) => writeKey(out, k); write(out, v) }
  }

  private def readStr(in: ByteReader): String =
    new String(in.readBytes(in.readVarInt().toInt), UTF_8)

  private def readKey(in: ByteReader): String =
    symbols match {
      case Some(tbl) => tbl(in.readVarInt().toInt)
      case None      => readStr(in)
    }

  private def read(in: ByteReader): J = (in.readBytes(1)(0) & 0xff) match {
    case 0 => JNull
    case 1 => JBool(false)
    case 2 => JBool(true)
    case 3 => JInt(in.readZigZag())
    case 4 =>
      val scale = in.readZigZag().toInt
      val unscaled = in.readZigZag()
      JDec(java.math.BigDecimal.valueOf(unscaled, scale))
    case 5 => JStr(readStr(in))
    case 6 => JArr(Vector.fill(in.readVarInt().toInt)(read(in)))
    case 7 => JObj(Vector.fill(in.readVarInt().toInt)(readKey(in) -> read(in)))
    case t => throw new IllegalArgumentException(s"bad Ion tag $t")
  }

  def encode(j: J): Array[Byte] = {
    val out = new ByteWriter(128)
    write(out, j)
    out.toBytes
  }

  def decode(bytes: Array[Byte]): J = read(new ByteReader(bytes))
}

object IonB {
  /** Record mode — self-contained records, keys inline. */
  val recordMode: IonB = new IonB(None)

  /** File mode — shared key symbol table collected from the corpus. */
  def fileMode(records: Seq[J]): IonB = {
    val keys = scala.collection.mutable.LinkedHashSet.empty[String]
    def collect(j: J): Unit = j match {
      case J.JObj(fs) => fs.foreach { case (k, v) => keys += k; collect(v) }
      case J.JArr(is) => is.foreach(collect)
      case _          => ()
    }
    records.foreach(collect)
    new IonB(Some(keys.toVector))
  }
}
