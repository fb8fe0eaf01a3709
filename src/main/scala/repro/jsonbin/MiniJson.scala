package repro.jsonbin

import com.fasterxml.jackson.databind.{DeserializationFeature, JsonNode, ObjectMapper}
import com.fasterxml.jackson.databind.node._
import scala.jdk.CollectionConverters._

/** Minimal JSON tree used by the Ion-B / BinPack-D serializers.
  *
  * Numbers are kept as `BigDecimal` (scale-preserving) or `Long`, so
  * `50.25`, `0.10` and large ids round-trip byte-exactly through
  * canonical rendering. Object key order is preserved (insertion order),
  * as the binary formats under study serialize fields in order.
  */
sealed trait J extends Serializable
object J {
  case object JNull extends J
  final case class JBool(v: Boolean) extends J
  final case class JInt(v: Long) extends J
  final case class JDec(v: java.math.BigDecimal) extends J
  final case class JStr(v: String) extends J
  final case class JArr(items: Vector[J]) extends J
  final case class JObj(fields: Vector[(String, J)]) extends J
}

object MiniJson {
  import J._

  private val mapper = new ObjectMapper()
    .configure(DeserializationFeature.USE_BIG_DECIMAL_FOR_FLOATS, true)
    .configure(DeserializationFeature.USE_LONG_FOR_INTS, true)
    // keep "0.10" as scale-2 BigDecimal — stripping would break lossless
    // round-trips of canonical JSON
    .configure(com.fasterxml.jackson.databind.cfg.JsonNodeFeature.STRIP_TRAILING_BIGDECIMAL_ZEROES, false)

  private def fromNode(n: JsonNode): J = n match {
    case _: NullNode    => JNull
    case b: BooleanNode => JBool(b.booleanValue())
    case d: DecimalNode => JDec(d.decimalValue())
    case i if i.isIntegralNumber => JInt(i.longValue())
    case d if d.isNumber => JDec(d.decimalValue())
    case s: TextNode    => JStr(s.textValue())
    case a: ArrayNode   => JArr(a.elements().asScala.map(fromNode).toVector)
    case o: ObjectNode  =>
      JObj(o.properties().asScala.iterator.map(e => e.getKey -> fromNode(e.getValue)).toVector)
    case other => throw new IllegalArgumentException(s"unsupported JSON node: $other")
  }

  def parse(text: String): J = fromNode(mapper.readTree(text))

  /** Canonical compact rendering — parse(render(j)) == j and
    * render(parse(s)) is the normal form used by round-trip tests.
    */
  def render(j: J): String = {
    val sb = new StringBuilder
    def esc(s: String): Unit = {
      sb.append('"')
      s.foreach {
        case '"'  => sb.append("\\\"")
        case '\\' => sb.append("\\\\")
        case '\n' => sb.append("\\n")
        case '\r' => sb.append("\\r")
        case '\t' => sb.append("\\t")
        case c if c < ' ' => sb.append(f"\\u${c.toInt}%04x")
        case c    => sb.append(c)
      }
      sb.append('"')
    }
    def go(x: J): Unit = x match {
      case JNull    => sb.append("null")
      case JBool(v) => sb.append(v)
      case JInt(v)  => sb.append(v)
      case JDec(v)  => sb.append(v.toPlainString)
      case JStr(v)  => esc(v)
      case JArr(items) =>
        sb.append('[')
        items.zipWithIndex.foreach { case (it, i) => if (i > 0) sb.append(','); go(it) }
        sb.append(']')
      case JObj(fields) =>
        sb.append('{')
        fields.zipWithIndex.foreach { case ((k, v), i) =>
          if (i > 0) sb.append(','); esc(k); sb.append(':'); go(v)
        }
        sb.append('}')
    }
    go(j)
    sb.toString
  }
}
