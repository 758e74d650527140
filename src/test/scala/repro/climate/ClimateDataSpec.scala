package repro.climate

import org.scalatest.funsuite.AnyFunSuite
import repro.core.WindowStats

class ClimateDataSpec extends AnyFunSuite {

  test("deterministic in (n, len, seed)") {
    val a = ClimateData.series(5, 100, 1L)
    val b = ClimateData.series(5, 100, 1L)
    assert(a.zip(b).forall { case (x, y) => x.sameElements(y) })
  }

  test("different seeds give different data") {
    val a = ClimateData.series(3, 50, 1L)
    val b = ClimateData.series(3, 50, 2L)
    assert(!a(0).sameElements(b(0)))
  }

  test("requested shape") {
    val d = ClimateData.series(7, 33, 3L)
    assert(d.length == 7 && d.forall(_.length == 33))
  }

  test("values are finite") {
    val d = ClimateData.series(10, 500, 4L)
    assert(d.forall(_.forall(v => !v.isNaN && !v.isInfinite)))
  }

  test("series are non-constant (no zero-variance windows at realistic sizes)") {
    val d = ClimateData.series(6, 400, 5L)
    for (s <- d; w <- s.grouped(50))
      assert(WindowStats.of(w.toArray).std > 1e-6)
  }

  test("grid neighbours correlate more than far-apart nodes on average") {
    val n = 36 // 6×6 grid
    val d = ClimateData.series(n, 1200, 6L)
    val rows = 6
    def corr(i: Int, j: Int) = WindowStats.pearson(d(i), d(j))
    // neighbours: adjacent in grid row; far: opposite corners of the grid
    val near = (0 until n - 1).filter(i => i % rows != rows - 1).map(i => corr(i, i + 1))
    val far = for (i <- 0 until 6; j <- n - 6 until n) yield corr(i, j)
    assert(near.sum / near.size > far.sum / far.size,
      s"near=${near.sum / near.size} far=${far.sum / far.size}")
  }

  test("pairwise correlations spread across the threshold range") {
    val n = 20
    val d = ClimateData.series(n, 2000, 7L)
    val cs = for (i <- 0 until n; j <- i + 1 until n) yield WindowStats.pearson(d(i), d(j))
    assert(cs.max > 0.75, s"max=${cs.max}") // some edges at the paper's θ
    assert(cs.min < 0.5, s"min=${cs.min}")  // and some non-edges
  }

  test("non-stationarity: window means drift across the series") {
    val d = ClimateData.series(4, 1600, 8L)
    for (s <- d) {
      val means = s.grouped(200).map(w => WindowStats.of(w.toArray).mean).toSeq
      assert(means.max - means.min > 0.1, "window means should vary (uncooperative series)")
    }
  }

  test("ncea and berkeley presets differ in defaults but share the generator") {
    val a = ClimateData.ncea(n = 4, len = 60)
    val b = ClimateData.berkeley(n = 4, len = 60)
    assert(a.length == 4 && b.length == 4)
    assert(!a(0).sameElements(b(0))) // different seeds
  }
}
