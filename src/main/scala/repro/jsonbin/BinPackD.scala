package repro.jsonbin

import java.nio.charset.StandardCharsets.UTF_8
import repro.core.{ByteReader, ByteWriter}

/** JSON-BinPack-style schema-driven serializer ("BP-D" in Tables 6–7).
  *
  * The real JSON BinPack consumes an application-provided JSON Schema;
  * here the schema is *inferred from a corpus sample*, which plays the
  * same role (the paper calls it "the ground-truth JSON schema provided
  * by the application"). Schema-driven wins come from:
  *  - objects: fixed field order ⇒ keys are never stored; optional
  *    fields use a presence bitmap;
  *  - constants: fields always carrying the same value cost 0 bytes;
  *  - enums: small observed domains become varint indices (with an
  *    escape index for unseen values);
  *  - integers: offset-encoded against the observed minimum;
  *  - anything irregular falls back to self-contained Ion encoding.
  */
object BinPackD {
  import J._

  sealed trait Schema extends Serializable
  final case class SConst(value: J) extends Schema
  final case class SEnum(values: Vector[J]) extends Schema
  final case class SInt(min: Long) extends Schema
  case object SDec extends Schema
  case object SStr extends Schema
  case object SBool extends Schema
  case object SNull extends Schema
  final case class SArr(item: Schema) extends Schema
  final case class SObj(fields: Vector[(String, Schema, Boolean)]) extends Schema
  case object SAny extends Schema

  private val MaxEnum = 32

  /** Infer a schema from sample records. */
  def inferSchema(sample: Seq[J]): Schema = infer(sample.toVector)

  private def infer(values: Vector[J]): Schema = {
    val distinct = values.distinct
    if (distinct.size == 1) return SConst(distinct.head)

    val kinds = distinct.map {
      case JObj(_)  => 'o'
      case JArr(_)  => 'a'
      case JInt(_)  => 'i'
      case JDec(_)  => 'd'
      case JStr(_)  => 's'
      case JBool(_) => 'b'
      case JNull    => 'n'
    }.toSet

    if (kinds == Set('o')) {
      // union of keys in first-appearance order; optional = missing somewhere
      val order = scala.collection.mutable.LinkedHashSet.empty[String]
      values.foreach { case JObj(fs) => fs.foreach(f => order += f._1); case _ => () }
      val fields = order.toVector.map { k =>
        val present = values.collect { case JObj(fs) => fs.collectFirst { case (`k`, v) => v } }
        val vs = present.flatten
        val optional = present.exists(_.isEmpty)
        (k, infer(vs), optional)
      }
      SObj(fields)
    } else if (kinds == Set('a')) {
      val items = values.flatMap { case JArr(is) => is; case _ => Vector.empty }
      if (items.isEmpty) SArr(SAny) else SArr(infer(items))
    } else if (kinds == Set('i')) {
      if (distinct.size <= MaxEnum && distinct.size * 4 < values.size) SEnum(distinct)
      else SInt(values.collect { case JInt(v) => v }.min)
    } else if (kinds == Set('d')) SDec
    else if (kinds == Set('s')) {
      if (distinct.size <= MaxEnum && distinct.size * 4 < values.size) SEnum(distinct)
      else SStr
    } else if (kinds == Set('b')) SBool
    else if (kinds == Set('n')) SNull
    else if (distinct.size <= MaxEnum) SEnum(distinct)
    else SAny
  }

  private def writeStr(out: ByteWriter, s: String): Unit = {
    val b = s.getBytes(UTF_8)
    out.writeVarInt(b.length.toLong); out.writeBytes(b)
  }

  /** Encode `j` against `schema`; throws on schema violation (the caller
    * then falls back to the Ion path — see [[encode]]).
    */
  private def write(out: ByteWriter, schema: Schema, j: J): Unit = (schema, j) match {
    case (SConst(v), x) =>
      if (v != x) throw SchemaViolation
    case (SEnum(vs), x) =>
      val i = vs.indexOf(x)
      if (i >= 0) out.writeVarInt(i.toLong)
      else { // escape index + length-prefixed Ion payload
        out.writeVarInt(vs.length.toLong)
        out.writeBytes(lenPrefixed(IonB.recordMode.encode(x)))
      }
    case (SInt(min), JInt(v)) => out.writeZigZag(v - min)
    case (SDec, JDec(v)) =>
      out.writeZigZag(v.scale.toLong); out.writeZigZag(v.unscaledValue.longValueExact())
    case (SStr, JStr(v))  => writeStr(out, v)
    case (SBool, JBool(v)) => out.writeByte(if (v) 1 else 0)
    case (SNull, JNull)   => ()
    case (SArr(item), JArr(is)) =>
      out.writeVarInt(is.length.toLong); is.foreach(write(out, item, _))
    case (SObj(fields), JObj(fs)) =>
      val m = fs.toMap
      if (fs.exists { case (k, _) => !fields.exists(_._1 == k) }) throw SchemaViolation
      if (fs.map(_._1) != fields.collect { case (k, _, _) if m.contains(k) => k })
        throw SchemaViolation // field order differs from schema
      // presence bitmap over optional fields
      val optionals = fields.filter(_._3)
      var bits = 0L
      optionals.zipWithIndex.foreach { case ((k, _, _), i) => if (m.contains(k)) bits |= (1L << i) }
      if (optionals.size > 63) throw SchemaViolation
      if (optionals.nonEmpty) out.writeVarInt(bits)
      fields.foreach { case (k, s, opt) =>
        m.get(k) match {
          case Some(v)          => write(out, s, v)
          case None if opt      => ()
          case None             => throw SchemaViolation
        }
      }
    case (SAny, x) => out.writeBytes(lenPrefixed(IonB.recordMode.encode(x)))
    case _ => throw SchemaViolation
  }

  private def lenPrefixed(b: Array[Byte]): Array[Byte] = {
    val w = new ByteWriter(b.length + 5)
    w.writeVarInt(b.length.toLong); w.writeBytes(b)
    w.toBytes
  }

  private def read(in: ByteReader, schema: Schema): J = schema match {
    case SConst(v) => v
    case SEnum(vs) =>
      val i = in.readVarInt().toInt
      if (i < vs.length) vs(i)
      else IonB.recordMode.decode(in.readBytes(in.readVarInt().toInt)) // escape
    case SInt(min) => JInt(in.readZigZag() + min)
    case SDec =>
      val scale = in.readZigZag().toInt
      JDec(java.math.BigDecimal.valueOf(in.readZigZag(), scale))
    case SStr  => JStr(new String(in.readBytes(in.readVarInt().toInt), UTF_8))
    case SBool => JBool(in.readBytes(1)(0) == 1)
    case SNull => JNull
    case SArr(item) => JArr(Vector.fill(in.readVarInt().toInt)(read(in, item)))
    case SObj(fields) =>
      val optionals = fields.filter(_._3)
      val bits = if (optionals.nonEmpty) in.readVarInt() else 0L
      var oi = 0
      val out = Vector.newBuilder[(String, J)]
      fields.foreach { case (k, s, opt) =>
        val present = if (opt) { val p = (bits & (1L << oi)) != 0; oi += 1; p } else true
        if (present) out += (k -> read(in, s))
      }
      JObj(out.result())
    case SAny =>
      val n = in.readVarInt().toInt
      IonB.recordMode.decode(in.readBytes(n))
  }

  private object SchemaViolation extends RuntimeException("schema violation") {
    override def fillInStackTrace(): Throwable = this
  }

  /** Per-record encoding: flag byte 0 = schema-encoded, 1 = Ion fallback. */
  def encode(schema: Schema, j: J): Array[Byte] = {
    val out = new ByteWriter(64)
    try {
      val body = new ByteWriter(64)
      write(body, schema, j)
      out.writeByte(0); out.writeBytes(body.toBytes)
    } catch {
      case SchemaViolation =>
        out.writeByte(1); out.writeBytes(IonB.recordMode.encode(j))
    }
    out.toBytes
  }

  def decode(schema: Schema, bytes: Array[Byte]): J = {
    val in = new ByteReader(bytes)
    val flag = in.readBytes(1)(0)
    if (flag == 0) read(in, schema)
    else IonB.recordMode.decode(in.readRest())
  }
}
