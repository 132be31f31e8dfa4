package repro.util

import org.scalatest.funsuite.AnyFunSuite

/** Pure units for the timing/table harness. */
class BenchSpec extends AnyFunSuite {

  test("timeMs returns the thunk's value") {
    assert(Bench.timeMs(40 + 2)._1 == 42)
  }

  test("timeMs measures elapsed time") {
    val (_, ms) = Bench.timeMs(Thread.sleep(20))
    assert(ms >= 15.0)
  }

  test("medianMs runs warmup + reps and returns a median") {
    var calls = 0
    val m = Bench.medianMs(reps = 3, warmup = 2) { calls += 1 }
    assert(calls == 5)
    assert(m >= 0.0)
  }

  test("row formats doubles with one decimal") {
    assert(Bench.row("a", 1.234, 5L) == "| a | 1.2 | 5 |")
  }

  test("table emits title, header, separator and rows") {
    val lines = Bench.table("T", Seq("x", "y"), Seq(Seq(1, 2), Seq(3, 4)))
    assert(lines == Seq("\n### T", "| x | y |", "| --- | --- |", "| 1 | 2 |", "| 3 | 4 |"))
  }
}
