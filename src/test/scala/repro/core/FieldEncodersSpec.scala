package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropUtil
import FieldEncoder._

class FieldEncodersSpec extends AnyFunSuite with PropUtil {

  private def roundTrip(e: FieldEncoder, v: String): String = {
    assert(e.accepts(v), s"${e.tag} should accept '$v'")
    val out = new ByteWriter()
    e.encode(v, out)
    e.decode(new ByteReader(out.toBytes))
  }

  // ---- CHAR(n) ----

  test("CHAR(3) round-trips fixed-length strings") {
    assert(roundTrip(Char_(3), "abc") == "abc")
  }

  test("CHAR rejects wrong lengths") {
    assert(!Char_(3).accepts("ab"))
    assert(!Char_(3).accepts("abcd"))
  }

  test("CHAR length is in bytes, not chars (UTF-8)") {
    assert(!Char_(1).accepts("é")) // é is 2 bytes in UTF-8
  }

  test("CHAR(2) accepts a 2-byte UTF-8 char and round-trips") {
    assert(roundTrip(Char_(2), "é") == "é")
  }

  test("CHAR uses no length descriptor") {
    val out = new ByteWriter()
    Char_(4).encode("wxyz", out)
    assert(out.toBytes.length == 4)
  }

  // ---- VARCHAR ----

  test("VARCHAR accepts anything including empty") {
    assert(VarChar.accepts(""))
    assert(roundTrip(VarChar, "") == "")
    assert(roundTrip(VarChar, "hello world") == "hello world")
  }

  test("VARCHAR costs 1 length byte for short strings") {
    val out = new ByteWriter()
    VarChar.encode("abcd", out)
    assert(out.toBytes.length == 5)
  }

  test("VARCHAR round-trip property over random ascii") {
    forAllSeeded() { r =>
      val s = randomAscii(r, 50)
      assert(roundTrip(VarChar, s) == s)
    }
  }

  // ---- INT(n,m) ----

  test("INT(2,1) encodes two digits in one byte") {
    val out = new ByteWriter()
    Int_(2, 1).encode("42", out)
    assert(out.toBytes.length == 1)
    assert(roundTrip(Int_(2, 1), "42") == "42")
  }

  test("INT preserves leading zeros") {
    assert(roundTrip(Int_(4, 2), "0042") == "0042")
    assert(roundTrip(Int_(3, 2), "007") == "007")
  }

  test("INT rejects wrong length and non-digits") {
    val e = Int_(3, 2)
    assert(!e.accepts("12"))
    assert(!e.accepts("1234"))
    assert(!e.accepts("12a"))
    assert(!e.accepts("-12"))
  }

  test("INT(10,5) handles timestamps") {
    assert(roundTrip(Int_(10, 5), "1639574096") == "1639574096")
  }

  test("INT(18,8) handles the max digit width") {
    assert(roundTrip(Int_(18, 8), "999999999999999999") == "999999999999999999")
  }

  test("INT constructor rejects out-of-range shapes") {
    intercept[IllegalArgumentException](Int_(0, 1))
    intercept[IllegalArgumentException](Int_(19, 8))
    intercept[IllegalArgumentException](Int_(4, 9))
  }

  test("INT round-trip property") {
    forAllSeeded() { r =>
      val n = 1 + r.nextInt(18)
      val v = (1 to n).map(_ => ('0' + r.nextInt(10)).toChar).mkString
      val m = bytesForDigits(n)
      assert(roundTrip(Int_(n, m), v) == v)
    }
  }

  // ---- VARINT ----

  test("VARINT accepts leading-zero-free digits") {
    assert(VarIntEnc.accepts("0"))
    assert(VarIntEnc.accepts("123"))
    assert(!VarIntEnc.accepts("0123"))
    assert(!VarIntEnc.accepts(""))
    assert(!VarIntEnc.accepts("12a"))
  }

  test("VARINT round-trips") {
    assert(roundTrip(VarIntEnc, "0") == "0")
    assert(roundTrip(VarIntEnc, "123456789") == "123456789")
  }

  test("VARINT rejects over-long digits") {
    assert(!VarIntEnc.accepts("1234567890123456789")) // 19 digits
  }

  // ---- bytesForDigits ----

  test("bytesForDigits matches information content") {
    assert(bytesForDigits(1) == 1) //   9 < 255
    assert(bytesForDigits(2) == 1) //  99 < 255
    assert(bytesForDigits(3) == 2) // 999 > 255
    assert(bytesForDigits(4) == 2)
    assert(bytesForDigits(5) == 3)
    assert(bytesForDigits(10) == 5)
    assert(bytesForDigits(18) == 8)
  }

  // ---- selection ----

  test("select: equal-length digits -> INT") {
    assert(FieldEncoder.select(Seq("12", "99", "07")) == Int_(2, 1))
  }

  test("select: variable-length digits -> VARINT") {
    assert(FieldEncoder.select(Seq("5", "123", "99")) == VarIntEnc)
  }

  test("select: digits with leading zeros and variable length -> not VARINT") {
    val e = FieldEncoder.select(Seq("007", "19"))
    assert(e == VarChar)
  }

  test("select: constant-length non-digits -> CHAR") {
    assert(FieldEncoder.select(Seq("abc", "xyz", "pqr")) == Char_(3))
  }

  test("select: too few samples for a fixed-shape encoder -> variable shapes") {
    assert(FieldEncoder.select(Seq("12", "99")) == VarIntEnc)
    assert(FieldEncoder.select(Seq("ab", "cd")) == VarChar)
  }

  test("select: mixed lengths -> VARCHAR") {
    assert(FieldEncoder.select(Seq("ab", "abc")) == VarChar)
  }

  test("select: empty strings force VARCHAR over CHAR(0)") {
    assert(FieldEncoder.select(Seq("", "")) == VarChar)
  }

  test("select rejects empty sample") {
    intercept[IllegalArgumentException](FieldEncoder.select(Nil))
  }

  test("selected encoder always accepts its sample") {
    forAllSeeded() { r =>
      val vals = Vector.fill(1 + r.nextInt(5))(randomAscii(r, 10))
      val e = FieldEncoder.select(vals)
      vals.foreach(v => assert(e.accepts(v), s"${e.tag} rejects '$v'"))
    }
  }

  // ---- tags ----

  test("tag round-trip for every encoder") {
    for (e <- Seq(VarChar, VarIntEnc, Char_(7), Int_(6, 3)))
      assert(FieldEncoder.fromTag(e.tag) == e)
  }

  test("fromTag rejects junk") {
    intercept[IllegalArgumentException](FieldEncoder.fromTag("FLOAT"))
  }
}
