package repro.logreducer

import org.scalatest.funsuite.AnyFunSuite
import repro.PropUtil
import repro.data.MachineData
import java.nio.charset.StandardCharsets.UTF_8

class LogReducerSpec extends AnyFunSuite with PropUtil {

  for (name <- MachineData.logDatasets) {
    test(s"round-trips $name lines exactly") {
      val lines = MachineData.records(name, 400)
      assert(LogReducer.decompress(LogReducer.compress(lines)) == lines)
    }
  }

  test("compresses templated logs below 12% of raw") {
    val lines = MachineData.records("Apache", 2000)
    val raw = lines.map(_.getBytes(UTF_8).length).sum
    val comp = LogReducer.compress(lines).length
    assert(comp.toDouble / raw < 0.12, s"ratio=${comp.toDouble / raw}")
  }

  test("handles lines with repeated spaces losslessly") {
    val lines = Vector("a  b   c", "a  b   d", "x  1")
    assert(LogReducer.decompress(LogReducer.compress(lines)) == lines)
  }

  test("handles empty lines and single-token lines") {
    val lines = Vector("", "one", "", "two")
    assert(LogReducer.decompress(LogReducer.compress(lines)) == lines)
  }

  test("numeric columns survive including negatives and zeros") {
    val lines = Vector("val -5 end", "val 0 end", "val 123 end", "val -99 end")
    assert(LogReducer.decompress(LogReducer.compress(lines)) == lines)
  }

  test("leading-zero numbers are not corrupted") {
    val lines = Vector("code 007 ok", "code 042 ok", "code 999 ok")
    assert(LogReducer.decompress(LogReducer.compress(lines)) == lines)
  }

  test("preserves line order across interleaved templates") {
    val lines = (0 until 100).map { i =>
      if (i % 2 == 0) s"GET /a/$i 200" else s"PUT /b/$i 404"
    }.toVector
    assert(LogReducer.decompress(LogReducer.compress(lines)) == lines)
  }

  test("property: random token lines round-trip") {
    forAllSeeded(50) { r =>
      val lines = Vector.fill(20)(
        (0 until r.nextInt(6)).map(_ => randomAscii(r, 8).replace(" ", "_")).mkString(" "))
      assert(LogReducer.decompress(LogReducer.compress(lines)) == lines)
    }
  }
}
