package repro.experiments

import org.scalatest.funsuite.AnyFunSuite

/** Harness plumbing: table rendering, formatting, timing, and the
  * Section IV-A defaults in ExpConfig.
  */
class RunnerSpec extends AnyFunSuite {

  test("table renders a markdown table with header separator") {
    val t = Runner.table(Seq("a", "b"), Seq(Seq("1", "2"), Seq("3", "4")))
    val lines = t.trim.split("\n")
    assert(lines.length == 4)
    assert(lines(0) == "| a | b |")
    assert(lines(1) == "| --- | --- |")
    assert(lines(3) == "| 3 | 4 |")
  }

  test("fmtBytes switches units at 1 MB") {
    assert(Runner.fmtBytes(512) == "0.5 KB")
    assert(Runner.fmtBytes(2L * 1024 * 1024) == "2.00 MB")
  }

  test("fmtMs and fmtSci format plainly") {
    assert(Runner.fmtMs(12.345) == "12.3 ms")
    assert(Runner.fmtSci(0.00123).startsWith("1.230e"))
  }

  test("time measures a thunk and returns its value") {
    val t = Runner.time { Thread.sleep(10); 42 }
    assert(t.value == 42)
    assert(t.ms >= 5.0)
  }

  test("ExpConfig defaults follow Section IV-A") {
    assert(ExpConfig.c == 0.15)
    assert(ExpConfig.eps == 1e-9)
    assert(ExpConfig.rpprTheta == 1e-4)
    assert(ExpConfig.numSeeds > 0)
  }

  test("feasibility gates are ordered: BEAR ≤ NB-LIN (paper failure order)") {
    // BEAR fails from Google onward, NB-LIN from Pokec onward — so the
    // BEAR gate must not exceed the NB-LIN gate.
    assert(ExpConfig.bearMaxN <= ExpConfig.nbLinMaxN)
  }
}
