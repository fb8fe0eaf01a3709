package repro.tables

import org.scalatest.funsuite.AnyFunSuite

class BenchHelpersSpec extends AnyFunSuite {

  test("mbps computes megabytes per second") {
    assert(Bench.mbps(10_000_000L, 2.0) == 5.0)
  }

  test("mbps of zero time is infinite, not a crash") {
    assert(Bench.mbps(100L, 0.0).isInfinity)
  }

  test("time measures and returns the value") {
    val t = Bench.time { 21 * 2 }
    assert(t.value == 42)
    assert(t.seconds >= 0.0)
  }

  test("render aligns columns") {
    val s = Bench.render(Seq(Seq("a", "bb"), Seq("ccc", "d")))
    val lines = s.split("\n")
    assert(lines(0) == "a    bb")
    assert(lines(1) == "ccc  d ")
  }

  test("average groups by method and averages the metrics") {
    val rows = Vector(
      PerfRow("d1", "m", 0.2, 10, 100),
      PerfRow("d2", "m", 0.4, 30, 300),
      PerfRow("d1", "n", 0.5, 1, 2))
    val avg = Tables.average(rows)
    val m = avg.find(_.method == "m").get
    assert(math.abs(m.ratio - 0.3) < 1e-9)
    assert(math.abs(m.compMBps - 20) < 1e-9)
    assert(math.abs(m.decompMBps - 200) < 1e-9)
    assert(avg.exists(_.method == "n"))
  }

  test("fmtRatio and fmtSpeed render stable widths") {
    assert(Bench.fmtRatio(0.12345) == "0.123")
    assert(Bench.fmtSpeed(1234.5) == "1235")
    assert(Bench.fmtSpeed(12.345) == "12.35")
  }
}
