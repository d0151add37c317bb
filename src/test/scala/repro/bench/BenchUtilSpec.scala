package repro.bench

import org.scalatest.funsuite.AnyFunSuite

class BenchUtilSpec extends AnyFunSuite {

  test("timeSec returns the thunk's value and a non-negative duration") {
    val (v, s) = BenchUtil.timeSec { 40 + 2 }
    assert(v == 42 && s >= 0.0)
  }

  test("bestOfSec runs warmup + n reps and returns the minimum") {
    var runs = 0
    val best = BenchUtil.bestOfSec(3) { runs += 1 }
    assert(runs == 4) // 1 warmup + 3 timed
    assert(best >= 0.0)
  }

  test("renderTable aligns columns and includes a separator") {
    val t = BenchUtil.renderTable(Seq("a", "bbb"), Seq(Seq("xx", "y"), Seq("1", "22")))
    val lines = t.split("\n")
    assert(lines.length == 4)
    assert(lines.forall(_.length == lines.head.length))
    assert(lines(1).forall("|- ".contains(_)))
  }

  test("fmtBytes picks sensible units") {
    assert(BenchUtil.fmtBytes(512) == "512 B")
    assert(BenchUtil.fmtBytes(2048) == "2.00 KB")
    assert(BenchUtil.fmtBytes(3L * 1024 * 1024) == "3.00 MB")
    assert(BenchUtil.fmtBytes(5L * 1024 * 1024 * 1024) == "5.00 GB")
  }

  test("fmtSec switches between ms and s") {
    assert(BenchUtil.fmtSec(0.0005) == "0.50 ms")
    assert(BenchUtil.fmtSec(2.5) == "2.5 s")
    assert(BenchUtil.fmtSec(250.0) == "250 s")
  }
}
