package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.PropUtil

class MachineDataSpec extends AnyFunSuite with PropUtil {

  test("all 16 datasets of Table 2 are present") {
    assert(MachineData.all.size == 16)
    assert(MachineData.all.toSet ==
      Set("KV1", "KV2", "KV3", "KV4", "KV5", "Android", "Apache", "BGL", "HDFS",
        "Hadoop", "AliLogs", "cities", "github", "unece", "urls", "uuid"))
  }

  test("log and json subsets are consistent with the paper") {
    assert(MachineData.logDatasets == Vector("Android", "Apache", "BGL", "HDFS", "Hadoop", "AliLogs"))
    assert(MachineData.jsonDatasets == Vector("cities", "github", "unece"))
  }

  for (name <- MachineData.all) {
    test(s"$name: generation is deterministic in the seed") {
      assert(MachineData.records(name, 20, seed = 3) == MachineData.records(name, 20, seed = 3))
    }

    test(s"$name: different seeds differ") {
      assert(MachineData.records(name, 20, seed = 3) != MachineData.records(name, 20, seed = 4))
    }

    test(s"$name: records are non-empty and single-line") {
      MachineData.records(name, 50).foreach { r =>
        assert(r.nonEmpty)
        assert(!r.contains('\n'))
      }
    }
  }

  // Average record lengths should be in the ballpark of the paper's
  // Table 2 (generators are synthetic stand-ins; ±45 % tolerance).
  private val paperAvgLen = Map(
    "KV1" -> 71.5, "KV2" -> 158.6, "KV3" -> 90.6, "KV4" -> 44.1, "KV5" -> 53.1,
    "Android" -> 129.7, "Apache" -> 63.9, "BGL" -> 164.1, "HDFS" -> 141.2,
    "Hadoop" -> 266.9, "AliLogs" -> 299.2, "github" -> 863.8, "cities" -> 232.2,
    "unece" -> 4494.8, "urls" -> 63.1, "uuid" -> 35.6)

  for ((name, expected) <- paperAvgLen) {
    test(s"$name: average record length within 45% of the paper (${expected})") {
      val rs = MachineData.records(name, 300)
      val avg = rs.map(_.length).sum.toDouble / rs.size
      assert(avg > expected * 0.55 && avg < expected * 1.45,
        s"avg=$avg expected≈$expected")
    }
  }

  test("uuid records are valid UUIDs (the randomness control)") {
    MachineData.records("uuid", 50).foreach { r =>
      assert(java.util.UUID.fromString(r).toString == r)
    }
  }

  test("JSON datasets parse as JSON") {
    for (name <- MachineData.jsonDatasets)
      MachineData.records(name, 20).foreach(repro.jsonbin.MiniJson.parse)
  }

  test("benchCounts covers every dataset") {
    assert(MachineData.benchCounts.keySet == MachineData.all.toSet)
  }

  test("unknown dataset name is rejected") {
    intercept[IllegalArgumentException](MachineData.records("nope", 1))
  }
}
