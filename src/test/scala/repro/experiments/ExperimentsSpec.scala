package repro.experiments

import org.scalatest.funsuite.AnyFunSuite
import repro.climate.ClimateData

/** Sanity checks for the figure harnesses on tiny inputs — the benches
  * assert the paper's shape claims at full scale; these make sure the
  * harness plumbing itself (row counts, invariants, positivity) is sound
  * and fast to check in the unit suite.
  */
class ExperimentsSpec extends AnyFunSuite {

  private lazy val tiny = ClimateData.ncea(n = 8, len = 400)

  test("fig5a: one row per coefficient count, exact edges constant") {
    val rows = InMemoryFigures.fig5a(tiny, b = 40, theta = 0.5, coeffs = Seq(10, 20, 40))
    assert(rows.map(_.nCoeff) == Seq(10, 20, 40))
    assert(rows.map(_.edgesExact).distinct.size == 1, "exact network is coefficient-independent")
  }

  test("fig5a: full coefficients give identical networks") {
    val rows = InMemoryFigures.fig5a(tiny, b = 40, theta = 0.5, coeffs = Seq(40))
    assert(rows.head.edgesDft == rows.head.edgesExact)
    assert(rows.head.simRatio == 1.0)
  }

  test("fig5a: similarity ratio stays in [0, 1]") {
    val rows = InMemoryFigures.fig5a(tiny, b = 40, theta = 0.5, coeffs = Seq(5, 40))
    rows.foreach(r => assert(r.simRatio >= 0.0 && r.simRatio <= 1.0))
  }

  test("fig5b: one row per B, all timings positive") {
    val rows = InMemoryFigures.fig5b(tiny, queryWindow = 400, bs = Seq(20, 40))
    assert(rows.map(_.b) == Seq(20, 40))
    rows.foreach { r =>
      assert(r.tsubasaSketchMs > 0 && r.tsubasaQueryMs > 0)
      assert(r.dftSketchMs > 0 && r.dftQueryMs > 0)
    }
  }

  test("fig5c: one row per query window, all timings positive") {
    val rows = InMemoryFigures.fig5c(tiny, b = 20, queryWindows = Seq(100, 200, 400))
    assert(rows.map(_.queryWindow) == Seq(100, 200, 400))
    rows.foreach(r => assert(r.tsubasaMs > 0 && r.dftMs > 0 && r.baselineMs > 0))
  }

  test("fig5d: one row per B, all timings positive") {
    val rows = InMemoryFigures.fig5d(tiny, queryWindow = 200, bs = Seq(20, 40), reps = 2)
    assert(rows.map(_.b) == Seq(20, 40))
    rows.foreach(r => assert(r.tsubasaUpdateMs > 0 && r.dftUpdateMs > 0))
  }

  test("fig5d rejects windows that exceed the data") {
    intercept[IllegalArgumentException](
      InMemoryFigures.fig5d(tiny, queryWindow = 400, bs = Seq(100), reps = 5))
  }

  test("printTable renders header, rule and aligned rows") {
    val out = new java.io.ByteArrayOutputStream()
    Console.withOut(out) {
      InMemoryFigures.printTable(Seq("a", "bb"), Seq(Seq[Any](1, 2.5), Seq[Any](30, 4.25)))
    }
    val lines = out.toString.linesIterator.toSeq
    assert(lines.length == 4)
    assert(lines(0).trim.startsWith("a"))
    assert(lines(1).forall(c => c == '-' || c == ' '))
    assert(lines(2).contains("2.500") && lines(3).contains("4.250"))
    assert(lines(3).contains("30") && !lines(3).contains("30.000"))
  }

  test("Timing.medianMs returns the middle of an odd number of runs") {
    var i = 0
    val ms = Timing.medianMs(3) { i += 1 }
    assert(i == 3 && ms >= 0.0)
  }

  test("Timing.time returns both result and elapsed") {
    val (r, ms) = Timing.time { Thread.sleep(5); 42 }
    assert(r == 42 && ms >= 4.0)
  }
}
