package repro.dft

import org.scalatest.funsuite.AnyFunSuite
import repro.TestSeries
import repro.core.{BasicWindows, ExactCorrelation, WindowStats}

class ApproxCorrelationSpec extends AnyFunSuite {

  private val tol = 1e-9

  test("normalize yields zero mean and unit L2 norm") {
    val x = TestSeries.gaussian(50, 1)
    val n = ApproxCorrelation.normalize(x, WindowStats.of(x))
    assert(math.abs(n.sum) < 1e-8)
    assert(math.abs(n.map(v => v * v).sum - 1.0) < 1e-8)
  }

  test("normalize maps constant windows to the zero vector") {
    val n = ApproxCorrelation.normalize(TestSeries.constant(20, 5.0), WindowStats(20, 5.0, 0.0))
    assert(n.forall(_ == 0.0))
  }

  for (b <- Seq(4, 10, 32, 100)) {
    test(s"Equation 3 exact with all coefficients: c = 1 − d²/2 (B=$b)") {
      val (x, y) = TestSeries.correlatedPair(b, 30L + b, 0.6)
      val sx = ApproxCorrelation.sketchWindow(x)
      val sy = ApproxCorrelation.sketchWindow(y)
      val dSq = ApproxCorrelation.windowDistSq(sx, sy, b)
      assert(math.abs(ApproxCorrelation.corrFromDistSq(dSq) - WindowStats.pearson(x, y)) < 1e-8)
    }
  }

  test("prefix distance under-estimates: estimated correlation ≥ exact") {
    val b = 60
    for (seed <- 1 to 10) {
      val (x, y) = TestSeries.correlatedPair(b, 40L + seed, 0.5)
      val sx = ApproxCorrelation.sketchWindow(x)
      val sy = ApproxCorrelation.sketchWindow(y)
      val exact = ApproxCorrelation.corrFromDistSq(ApproxCorrelation.windowDistSq(sx, sy, b))
      for (n <- Seq(5, 15, 30, 45)) {
        val est = ApproxCorrelation.corrFromDistSq(ApproxCorrelation.windowDistSq(sx, sy, n))
        assert(est >= exact - tol, s"seed=$seed n=$n")
      }
    }
  }

  test("Equation 4: no false negatives at any coefficient count") {
    val b = 50; val theta = 0.4
    for (seed <- 1 to 20) {
      val (x, y) = TestSeries.correlatedPair(b, 60L + seed, 0.7)
      val c = WindowStats.pearson(x, y)
      val sx = ApproxCorrelation.sketchWindow(x)
      val sy = ApproxCorrelation.sketchWindow(y)
      if (c >= theta) {
        for (n <- Seq(3, 10, 25, 50)) {
          val dist = math.sqrt(ApproxCorrelation.windowDistSq(sx, sy, n))
          assert(ApproxCorrelation.candidateEdge(dist, theta), s"false negative seed=$seed n=$n")
        }
      }
    }
  }

  for ((name, gen) <- TestSeries.families; b <- Seq(5, 20)) {
    test(s"Equation 5 with all coefficients equals exact Lemma 1: $name B=$b") {
      val (x, y) = gen(b * 6, 70L + b)
      val xs = BasicWindows.split(x, b); val ys = BasicWindows.split(y, b)
      val sx = xs.map(WindowStats.of).toIndexedSeq
      val sy = ys.map(WindowStats.of).toIndexedSeq
      val dSq = xs.indices.map { w =>
        ApproxCorrelation.windowDistSq(
          ApproxCorrelation.sketchWindow(xs(w)), ApproxCorrelation.sketchWindow(ys(w)), b)
      }
      val approx = ApproxCorrelation.eq5Corr(sx, sy, dSq)
      assert(math.abs(approx - TestSeries.refPearson(x, y)) < 1e-7)
    }
  }

  test("Equation 5 approximation error shrinks as coefficients grow") {
    val b = 40
    val x = repro.climate.ClimateData.series(2, b * 8, seed = 5L)
    val xs = BasicWindows.split(x(0), b); val ys = BasicWindows.split(x(1), b)
    val sx = xs.map(WindowStats.of).toIndexedSeq
    val sy = ys.map(WindowStats.of).toIndexedSeq
    val skx = xs.map(ApproxCorrelation.sketchWindow)
    val sky = ys.map(ApproxCorrelation.sketchWindow)
    val exact = TestSeries.refPearson(x(0), x(1))
    val errs = Seq(4, 10, 20, 40).map { n =>
      val dSq = xs.indices.map(w => ApproxCorrelation.windowDistSq(skx(w), sky(w), n))
      math.abs(ApproxCorrelation.eq5Corr(sx, sy, dSq) - exact)
    }
    assert(errs.last < 1e-7, "full coefficients must be exact")
    assert(errs.head >= errs.last - tol, "fewer coefficients must not beat exact")
  }

  test("Equation 6 slide equals Equation 5 recomputed from scratch") {
    val b = 10; val nWin = 4
    val (x, y) = TestSeries.correlatedPair(b * 10, 80L, 0.6)
    val xs = BasicWindows.split(x, b); val ys = BasicWindows.split(y, b)
    val sx = xs.map(WindowStats.of); val sy = ys.map(WindowStats.of)
    val nCoeff = 7
    val dSq = xs.indices.map { w =>
      ApproxCorrelation.windowDistSq(
        ApproxCorrelation.sketchWindow(xs(w)), ApproxCorrelation.sketchWindow(ys(w)), nCoeff)
    }
    var terms = ApproxCorrelation.eq5Terms(
      sx.take(nWin).toIndexedSeq, sy.take(nWin).toIndexedSeq, dSq.take(nWin))
    for (lo <- 0 until xs.length - nWin) {
      terms = ApproxCorrelation.eq6Slide(terms, sx(lo), sy(lo), dSq(lo),
        sx(lo + nWin), sy(lo + nWin), dSq(lo + nWin))
      val scratch = ApproxCorrelation.eq5Corr(
        sx.slice(lo + 1, lo + 1 + nWin).toIndexedSeq, sy.slice(lo + 1, lo + 1 + nWin).toIndexedSeq,
        dSq.slice(lo + 1, lo + 1 + nWin))
      assert(math.abs(terms.corr - scratch) < 1e-8, s"slide $lo")
    }
  }

  test("StatStream average aggregation") {
    assert(math.abs(ApproxCorrelation.statStreamAverage(IndexedSeq(0.2, 0.4, 0.9)) - 0.5) < 1e-12)
    assert(ApproxCorrelation.statStreamAverage(IndexedSeq(1.0)) == 1.0)
  }
}
