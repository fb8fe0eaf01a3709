package repro.jsonbin

import org.scalatest.funsuite.AnyFunSuite
import repro.PropUtil
import repro.data.MachineData
import J._

class MiniJsonSpec extends AnyFunSuite with PropUtil {

  private def canon(s: String): String = MiniJson.render(MiniJson.parse(s))

  test("parses scalars") {
    assert(MiniJson.parse("17") == JInt(17))
    assert(MiniJson.parse("true") == JBool(true))
    assert(MiniJson.parse("null") == JNull)
    assert(MiniJson.parse("\"x\"") == JStr("x"))
  }

  test("decimals preserve scale: 0.10 stays 0.10") {
    assert(canon("0.10") == "0.10")
    assert(canon("50.25") == "50.25")
  }

  test("key order is preserved") {
    assert(canon("""{"b":1,"a":2}""") == """{"b":1,"a":2}""")
  }

  test("nested structures round-trip") {
    val s = """{"a":[1,2,{"b":null}],"c":{"d":false}}"""
    assert(canon(s) == s)
  }

  test("string escapes round-trip") {
    val s = """{"k":"line\nbreak\t\"q\" \\"}"""
    assert(canon(s) == s)
  }

  test("generated JSON datasets are canonical (parse∘render = identity)") {
    for (name <- MachineData.jsonDatasets) {
      MachineData.records(name, 30).foreach { rec =>
        assert(canon(rec) == rec, s"$name record not canonical: $rec")
      }
    }
  }

  test("negative and large integers") {
    assert(canon("""{"a":-42,"b":9007199254740993}""") == """{"a":-42,"b":9007199254740993}""")
  }
}

class IonBSpec extends AnyFunSuite with PropUtil {

  private val sample: Vector[J] =
    MachineData.records("cities", 50).map(MiniJson.parse)

  test("record mode round-trips the JSON datasets") {
    for (name <- MachineData.jsonDatasets) {
      MachineData.records(name, 30).map(MiniJson.parse).foreach { j =>
        assert(IonB.recordMode.decode(IonB.recordMode.encode(j)) == j)
      }
    }
  }

  test("file mode round-trips with a shared symbol table") {
    val ion = IonB.fileMode(sample)
    sample.foreach(j => assert(ion.decode(ion.encode(j)) == j))
  }

  test("file mode is smaller than record mode (keys elided)") {
    val ion = IonB.fileMode(sample)
    val rec = sample.map(j => IonB.recordMode.encode(j).length).sum
    val fil = sample.map(j => ion.encode(j).length).sum
    assert(fil < rec)
  }

  test("binary encoding is smaller than the JSON text") {
    val texts = MachineData.records("cities", 50)
    val raw = texts.map(_.length).sum
    val enc = texts.map(t => IonB.recordMode.encode(MiniJson.parse(t)).length).sum
    assert(enc < raw)
  }

  test("all scalar types round-trip") {
    val j = JObj(Vector(
      "n" -> JNull, "t" -> JBool(true), "f" -> JBool(false),
      "i" -> JInt(-123456789L), "d" -> JDec(new java.math.BigDecimal("3.1400")),
      "s" -> JStr("héllo"), "a" -> JArr(Vector(JInt(1), JStr("x")))))
    assert(IonB.recordMode.decode(IonB.recordMode.encode(j)) == j)
  }

  test("empty containers round-trip") {
    val j = JObj(Vector("a" -> JArr(Vector.empty), "o" -> JObj(Vector.empty)))
    assert(IonB.recordMode.decode(IonB.recordMode.encode(j)) == j)
  }
}

class BinPackDSpec extends AnyFunSuite with PropUtil {
  import BinPackD._

  private def schemaFor(name: String, n: Int = 100): (Schema, Vector[J]) = {
    val js = MachineData.records(name, n).map(MiniJson.parse)
    (BinPackD.inferSchema(js), js)
  }

  for (name <- MachineData.jsonDatasets) {
    test(s"schema-encoded $name records round-trip") {
      val (schema, js) = schemaFor(name, if (name == "unece") 30 else 100)
      js.foreach(j => assert(BinPackD.decode(schema, BinPackD.encode(schema, j)) == j))
    }
  }

  test("BP-D is smaller than Ion-B record mode on schema-regular data") {
    val (schema, js) = schemaFor("github", 100)
    val bp = js.map(j => BinPackD.encode(schema, j).length).sum
    val ion = js.map(j => IonB.recordMode.encode(j).length).sum
    assert(bp < ion, s"bp=$bp ion=$ion")
  }

  test("constant fields cost zero bytes") {
    val js = Vector.fill(20)(MiniJson.parse("""{"type":"User","id":1}""")) :+
      MiniJson.parse("""{"type":"User","id":2}""")
    val schema = BinPackD.inferSchema(js)
    // record: flag byte + varint id; the constant "type" field is free
    assert(BinPackD.encode(schema, js.head).length <= 3)
  }

  test("enum fields use small indices with escape for unseen values") {
    val js = (0 until 40).map(i => MiniJson.parse(s"""{"side":"${if (i % 2 == 0) "B" else "S"}"}""")).toVector
    val schema = BinPackD.inferSchema(js)
    val unseen = MiniJson.parse("""{"side":"X"}""")
    assert(BinPackD.decode(schema, BinPackD.encode(schema, unseen)) == unseen)
  }

  test("integers are offset-encoded and handle out-of-sample values") {
    val js = (1000 to 1100).map(i => MiniJson.parse(s"""{"v":$i}""")).toVector
    val schema = BinPackD.inferSchema(js)
    val below = MiniJson.parse("""{"v":5}""")
    assert(BinPackD.decode(schema, BinPackD.encode(schema, below)) == below)
  }

  test("optional fields via presence bitmap") {
    val js = Vector(
      MiniJson.parse("""{"a":1,"b":"x"}"""),
      MiniJson.parse("""{"a":2}"""),
      MiniJson.parse("""{"a":3,"b":"y"}"""))
    val schema = BinPackD.inferSchema(js)
    js.foreach(j => assert(BinPackD.decode(schema, BinPackD.encode(schema, j)) == j))
  }

  test("records violating the schema fall back to Ion and round-trip") {
    val (schema, _) = schemaFor("cities", 50)
    val alien = MiniJson.parse("""{"totally":"different","shape":[1,2,3]}""")
    assert(BinPackD.decode(schema, BinPackD.encode(schema, alien)) == alien)
  }

  test("arrays of objects round-trip") {
    val js = Vector.fill(10)(MiniJson.parse("""{"xs":[{"a":1},{"a":2}]}"""))
    val schema = BinPackD.inferSchema(js)
    js.foreach(j => assert(BinPackD.decode(schema, BinPackD.encode(schema, j)) == j))
  }

  test("mixed-type fields fall back to SAny and round-trip") {
    val js = Vector(
      MiniJson.parse("""{"v":1}"""),
      MiniJson.parse("""{"v":"s"}"""),
      MiniJson.parse("""{"v":null}"""),
      MiniJson.parse("""{"v":2}"""),
      MiniJson.parse("""{"v":"t"}"""),
      MiniJson.parse("""{"v":3}"""),
      MiniJson.parse("""{"v":"u"}"""),
      MiniJson.parse("""{"v":4}"""),
      MiniJson.parse("""{"v":"v"}"""),
      MiniJson.parse("""{"v":5}"""))
    val schema = BinPackD.inferSchema(js)
    js.foreach(j => assert(BinPackD.decode(schema, BinPackD.encode(schema, j)) == j))
  }

  test("schema inference is deterministic") {
    val (s1, _) = schemaFor("cities", 80)
    val (s2, _) = schemaFor("cities", 80)
    assert(s1 == s2)
  }
}
