package repro.exp

import org.scalatest.funsuite.AnyFunSuite

class HarnessSpec extends AnyFunSuite {

  test("trimmedMeanSec discards the priming run") {
    var calls = 0
    val mean = Harness.trimmedMeanSec(2) { calls += 1; if (calls == 1) 100.0 else 1.0 }
    assert(calls == 3) // 1 priming + 2 measured
    assert(mean == 1.0)
  }

  test("trimmedMeanSec trims min and max with >= 3 runs") {
    val values = Iterator(99.0 /* priming */, 10.0, 1.0, 2.0)
    val mean = Harness.trimmedMeanSec(3)(values.next())
    assert(mean == 2.0) // middle of {10, 1, 2}
  }

  test("scaled enforces a minimum row count") {
    assert(Harness.scaled(100L) >= 1000L)
  }

  test("renderTable aligns columns and includes the title") {
    val t = Harness.renderTable("T", Seq("a", "bbb"), Seq(Seq("xx", "y"), Seq("1", "22")))
    val lines = t.linesIterator.toSeq
    assert(lines.head == "== T ==")
    // all body lines have equal length
    assert(lines.tail.map(_.length).distinct.size == 1)
    assert(lines(1).contains("a") && lines(1).contains("bbb"))
  }

  test("fmtSec renders three decimals") {
    assert(Harness.fmtSec(1.23456) == "1.235")
  }

  test("measurement label lookup") {
    val m = Harness.Measurement("e", Seq("k" -> "v"), 1.0)
    assert(m.label("k") == "v")
    assert(m.label("missing") == "")
  }
}
