package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropUtil
import repro.data.MachineData
import scala.util.Random

class PbcCodecSpec extends AnyFunSuite with PropUtil {

  private def trainOn(records: Seq[String], k: Int = 8, withFsst: Boolean = false): PbcCodec = {
    // small samples / short pattern caps: unit tests exercise correctness,
    // not ratio quality (the benches train at full strength)
    val maxLen = math.min(600, records.map(_.length).max + 1)
    val dict = PatternExtractor.train(records,
      PatternExtractor.Config(k = k, sampleSize = 60, maxPatternLen = maxLen, withFsst = withFsst))
    new PbcCodec(dict, useFsst = withFsst)
  }

  // ---- round-trips on every dataset (small scale) ----

  for (name <- MachineData.all) {
    test(s"PBC round-trips every record of $name") {
      val records = MachineData.records(name, if (name == "unece") 50 else 500)
      val codec = trainOn(records)
      records.foreach { rec =>
        assert(codec.decompress(codec.compress(rec)) == rec, s"lossy on: $rec")
      }
    }
  }

  for (name <- Seq("KV1", "Android", "github", "uuid")) {
    test(s"PBC_F round-trips every record of $name") {
      val records = MachineData.records(name, 300)
      val codec = trainOn(records, withFsst = true)
      records.foreach { rec =>
        assert(codec.decompress(codec.compress(rec)) == rec, s"lossy on: $rec")
      }
    }
  }

  // ---- compression behaviour ----

  test("templated data compresses below 60% of raw") {
    val records = MachineData.records("KV1", 2000)
    val codec = trainOn(records, k = 16)
    val raw = records.map(_.getBytes("UTF-8").length).sum
    val comp = records.map(r => codec.compress(r).length).sum
    assert(comp.toDouble / raw < 0.6, s"ratio=${comp.toDouble / raw}")
  }

  test("records unseen at training time still round-trip (generalization)") {
    val train = MachineData.records("KV3", 1000, seed = 1)
    val fresh = MachineData.records("KV3", 1000, seed = 999)
    val codec = trainOn(train, k = 16)
    fresh.foreach(r => assert(codec.decompress(codec.compress(r)) == r))
  }

  test("outliers are stored raw and round-trip") {
    val codec = trainOn(Vector.fill(50)("AAAA-1234"), k = 2)
    val outlier = "completely different record §§§"
    assert(codec.decompress(codec.compress(outlier)) == outlier)
    assert(codec.outlierCount >= 1)
  }

  test("outlier rate is tracked") {
    val codec = trainOn(Vector.fill(50)("AAAA-1234"), k = 2)
    codec.compress("AAAA-5678")
    codec.compress("zzz")
    assert(codec.recordCount == 2)
    assert(codec.outlierRate > 0.0 && codec.outlierRate <= 1.0)
  }

  test("matched records do not count as outliers") {
    val records = (0 until 100).map(i => f"item=$i%03d done").toVector
    val codec = trainOn(records, k = 2)
    records.foreach(codec.compress)
    assert(codec.outlierCount == 0, s"outliers=${codec.outlierCount}")
  }

  test("empty record round-trips") {
    val codec = trainOn(Vector("abc", "abd"), k = 1)
    assert(codec.decompress(codec.compress("")) == "")
  }

  test("unicode record round-trips (as outlier)") {
    val codec = trainOn(Vector("abc", "abd"), k = 1)
    val s = "héllo 世界 ✓"
    assert(codec.decompress(codec.compress(s)) == s)
  }

  test("property: arbitrary strings always round-trip") {
    val codec = trainOn(MachineData.records("KV4", 200), k = 8)
    forAllSeeded(200) { r =>
      val s = randomAscii(r, 80)
      assert(codec.decompress(codec.compress(s)) == s, s"lossy on: '$s'")
    }
  }

  test("property: PBC_F arbitrary strings always round-trip") {
    val codec = trainOn(MachineData.records("KV4", 200), k = 8, withFsst = true)
    forAllSeeded(200) { r =>
      val s = randomAscii(r, 80)
      assert(codec.decompress(codec.compress(s)) == s, s"lossy on: '$s'")
    }
  }

  test("PBC_F requires an FSST-bearing dictionary") {
    val dict = PatternExtractor.train(Vector("a", "b"), PatternExtractor.Config(k = 1))
    intercept[IllegalArgumentException](new PbcCodec(dict, useFsst = true))
  }

  test("PBC_F compresses at least as well as PBC on text-heavy data") {
    val records = MachineData.records("Android", 1000)
    val plain = trainOn(records, k = 16)
    val fsst = trainOn(records, k = 16, withFsst = true)
    val a = records.map(r => plain.compress(r).length.toLong).sum
    val b = records.map(r => fsst.compress(r).length.toLong).sum
    assert(b <= a, s"PBC_F=$b should be <= PBC=$a")
  }

  test("compressed records decode with a deserialized dictionary") {
    val records = MachineData.records("KV5", 300)
    val dict = PatternExtractor.train(records, PatternExtractor.Config(k = 8))
    val codec1 = new PbcCodec(dict)
    val codec2 = new PbcCodec(PatternDictionary.deserialize(dict.serialize))
    records.take(50).foreach { r =>
      assert(codec2.decompress(codec1.compress(r)) == r)
    }
  }

  // ---- framing ----

  test("Framing pack/unpack round-trips") {
    forAllSeeded(50) { r =>
      val recs = Vector.fill(r.nextInt(10))(randomBytes(r, 40))
      val unpacked = Framing.unpack(Framing.pack(recs.iterator))
      assert(unpacked.size == recs.size)
      unpacked.zip(recs).foreach { case (a, b) => assert(a.toSeq == b.toSeq) }
    }
  }

  test("Framing of an empty iterator is empty") {
    assert(Framing.unpack(Framing.pack(Iterator.empty)).isEmpty)
  }
}
