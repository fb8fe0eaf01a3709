package repro.sparkpbc

import java.nio.file.Files
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{PatternExtractor, PbcCodec}
import repro.data.MachineData

/** End-to-end tests of the `pbc` DataSourceV2 format and the executor
  * compression pipeline, including DuckDB-oracle query equivalence.
  */
class PbcDataSourceSpec extends SparkSpec {

  private def tempDir(): String =
    Files.createTempDirectory("pbc-test").toString

  private lazy val kv1 = MachineData.df(spark, "KV1", 3000)
  private lazy val dict = PbcSpark.train(kv1, "value", PatternExtractor.Config(k = 8, sampleSize = 100))

  test("write + read round-trips all rows through the pbc format") {
    import spark.implicits._
    val dir = tempDir()
    PbcSpark.write(kv1, "value", dict, dir)
    val back = PbcSpark.read(spark, dir)
    assert(back.count() == 3000)
    val orig = kv1.as[String].collect().sorted
    val got = back.as[String].collect().sorted
    assert(got.sameElements(orig))
  }

  test("pbc files are smaller than the raw data") {
    import spark.implicits._
    val dir = tempDir()
    PbcSpark.write(kv1, "value", dict, dir)
    val stored = PbcFiles.listParts(dir).map(p => Files.size(p)).sum
    val raw = kv1.as[String].collect().map(_.getBytes("UTF-8").length.toLong).sum
    assert(stored < raw, s"stored=$stored raw=$raw")
  }

  test("overwrite mode truncates previous parts") {
    val dir = tempDir()
    PbcSpark.write(kv1, "value", dict, dir)
    PbcSpark.write(kv1.limit(100), "value", dict, dir)
    assert(PbcSpark.read(spark, dir).count() == 100)
  }

  test("per-record random access decodes single records without a scan") {
    import spark.implicits._
    val dir = tempDir()
    PbcSpark.write(kv1.repartition(1), "value", dict, dir)
    val part = PbcFiles.listParts(dir).head
    val n = PbcFiles.recordCount(part)
    assert(n == 3000)
    val codec = new PbcCodec(PbcFiles.readDict(part), useFsst = false)
    val all = PbcFiles.readAll(part).records.map(codec.decompress)
    for (i <- Seq(0, 7, 1234, n - 1)) {
      val one = codec.decompress(PbcFiles.readRecord(part, i))
      assert(one == all(i))
    }
  }

  test("random access rejects out-of-range indices") {
    val dir = tempDir()
    PbcSpark.write(kv1.limit(10).repartition(1), "value", dict, dir)
    val part = PbcFiles.listParts(dir).head
    intercept[IllegalArgumentException](PbcFiles.readRecord(part, 10))
  }

  test("writer requires the dict option") {
    val ex = intercept[Exception] {
      kv1.select(col("value")).write.format("pbc").mode("append").save(tempDir())
    }
    assert(ex.getMessage.contains("pbc.dict") || ex.getCause != null)
  }

  test("executor pipeline compress/decompress round-trips") {
    import spark.implicits._
    val compressed = PbcSpark.compress(kv1, "value", dict)
    val back = PbcSpark.decompress(compressed, dict)
    assert(back.collect().sorted.sameElements(kv1.as[String].collect().sorted))
  }

  test("pipeline compression shrinks the data across executors") {
    import spark.implicits._
    val compBytes = PbcSpark.compress(kv1, "value", dict)
      .map(_.length.toLong).reduce(_ + _)
    val rawBytes = kv1.as[String].map(_.getBytes("UTF-8").length.toLong).reduce(_ + _)
    assert(compBytes < rawBytes)
  }

  test("oracle: aggregation over pbc-round-tripped orders matches DuckDB on the original") {
    val orders = SynthData.orders(spark, sf = 0.003).cache()
    import spark.implicits._
    // serialize orders to records, push through the pbc format, read back,
    // parse, aggregate — any codec corruption breaks result equality
    val asRecords = orders.select(
      concat_ws("|",
        $"o_orderkey", $"o_custkey", $"o_orderstatus",
        format_number($"o_totalprice", 2), $"o_orderdate"
      ).as("value"))
    val d = PbcSpark.train(asRecords, "value", PatternExtractor.Config(k = 8, sampleSize = 100))
    val dir = tempDir()
    PbcSpark.write(asRecords, "value", d, dir)
    val back = PbcSpark.read(spark, dir)
      .select(split($"value", "\\|").as("f"))
      .select(
        $"f".getItem(0).cast("long").as("o_orderkey"),
        $"f".getItem(2).as("o_orderstatus"))
    val agg = back.groupBy($"o_orderstatus")
      .agg(count(lit(1)).as("cnt"), max($"o_orderkey").as("max_key"))
    Oracle.assertEquivalent(
      agg,
      "SELECT o_orderstatus, count(*) AS cnt, max(CAST(o_orderkey AS BIGINT)) AS max_key " +
        "FROM orders GROUP BY o_orderstatus",
      "orders" -> orders)
  }

  test("oracle: pbc-compressed machine data preserves exact value multiset") {
    import spark.implicits._
    val df = MachineData.df(spark, "KV4", 2000)
    val dir = tempDir()
    val d = PbcSpark.train(df, "value", PatternExtractor.Config(k = 8, sampleSize = 100))
    PbcSpark.write(df, "value", d, dir)
    val back = PbcSpark.read(spark, dir)
    val agg = back.groupBy($"value").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      agg,
      "SELECT value, count(*) AS cnt FROM kv GROUP BY value",
      "kv" -> df)
  }
}
