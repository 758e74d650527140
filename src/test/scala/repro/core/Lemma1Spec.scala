package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, TestSeries}

/** Lemma 1: the sketch-combined correlation must equal direct Pearson on
  * the raw query window, exactly (up to float error), for every signal
  * family, basic window size, and window-size pattern.
  */
class Lemma1Spec extends AnyFunSuite with PropSupport {

  private val tol = 1e-9

  private def viaSketches(x: Array[Double], y: Array[Double], b: Int): Double = {
    val sx = BasicWindows.sketch(x, b).toIndexedSeq
    val sy = BasicWindows.sketch(y, b).toIndexedSeq
    val c = BasicWindows.pairCorrs(x, y, b).toIndexedSeq
    ExactCorrelation.lemma1(sx, sy, c)
  }

  for {
    (name, gen) <- TestSeries.families
    b <- Seq(1, 2, 5, 10, 25, 50)
  } {
    val len = 200
    test(s"lemma1 equals direct Pearson: $name B=$b") {
      val (x, y) = gen(len, 1000L + b)
      assert(math.abs(viaSketches(x, y, b) - TestSeries.refPearson(x, y)) < tol)
    }
  }

  for (nWin <- Seq(1, 2, 3, 7, 20)) {
    test(s"lemma1 exact with $nWin equal windows") {
      val b = 16
      val (x, y) = TestSeries.correlatedPair(nWin * b, 2000L + nWin, 0.6)
      assert(math.abs(viaSketches(x, y, b) - TestSeries.refPearson(x, y)) < tol)
    }
  }

  for (seed <- 1 to 10) {
    test(s"lemma1 exact with UNEQUAL window sizes (seed $seed)") {
      val r = new scala.util.Random(seed)
      // random partition of a 300-point window into 3..30-point basic windows
      val sizes = Iterator.continually(3 + r.nextInt(28)).scanLeft(0)(_ + _)
        .takeWhile(_ <= 280).toSeq.sliding(2).map(p => p(1) - p(0)).toSeq
      val total = sizes.sum
      val (x, y) = TestSeries.correlatedPair(total, 3000L + seed, 0.4)
      var off = 0
      val sx = IndexedSeq.newBuilder[WindowStats]
      val sy = IndexedSeq.newBuilder[WindowStats]
      val cs = IndexedSeq.newBuilder[Double]
      for (sz <- sizes) {
        val xs = x.slice(off, off + sz); val ys = y.slice(off, off + sz)
        sx += WindowStats.of(xs); sy += WindowStats.of(ys); cs += WindowStats.pearson(xs, ys)
        off += sz
      }
      val got = ExactCorrelation.lemma1(sx.result(), sy.result(), cs.result())
      assert(math.abs(got - TestSeries.refPearson(x, y)) < tol)
    }
  }

  test("lemma1 terms expose T·cov and T·var decomposition") {
    val b = 10
    val (x, y) = TestSeries.correlatedPair(100, 7, 0.5)
    val t = ExactCorrelation.terms(
      BasicWindows.sketch(x, b).toIndexedSeq, BasicWindows.sketch(y, b).toIndexedSeq,
      BasicWindows.pairCorrs(x, y, b).toIndexedSeq)
    val sx = WindowStats.of(x); val sy = WindowStats.of(y)
    assert(t.t == 100)
    assert(math.abs(t.tVarX - 100 * sx.variance) < 1e-7)
    assert(math.abs(t.tVarY - 100 * sy.variance) < 1e-7)
    assert(math.abs(t.numerator - 100 * WindowStats.covariance(x, y, sx, sy)) < 1e-7)
    assert(math.abs(t.grandMeanX - sx.mean) < tol)
    assert(math.abs(t.grandMeanY - sy.mean) < tol)
  }

  test("lemma1 handles constant series (zero variance) with the 0 convention") {
    val x = TestSeries.constant(60, 2.0)
    val y = TestSeries.gaussian(60, 8)
    assert(viaSketches(x, y, 10) == 0.0)
  }

  test("lemma1 handles windows that are locally constant but globally varying") {
    // each window constant but different levels: window correlation c_j = 0,
    // all signal lives in the between-window δ terms
    val x = Array.tabulate(50)(t => (t / 10).toDouble)
    val y = Array.tabulate(50)(t => 10.0 - (t / 10).toDouble)
    val got = viaSketches(x, y, 10)
    assert(math.abs(got - TestSeries.refPearson(x, y)) < tol)
    assert(math.abs(got + 1.0) < tol) // perfectly anti-correlated step functions
  }

  test("misaligned sketch lengths rejected") {
    val s = IndexedSeq(WindowStats(2, 0.0, 1.0))
    intercept[IllegalArgumentException](
      ExactCorrelation.lemma1(s, s ++ s, IndexedSeq(0.5)))
  }

  test("mismatched window sizes across series rejected") {
    intercept[IllegalArgumentException](
      ExactCorrelation.lemma1(
        IndexedSeq(WindowStats(2, 0.0, 1.0)), IndexedSeq(WindowStats(3, 0.0, 1.0)), IndexedSeq(0.5)))
  }

  for ((name, gen) <- TestSeries.families) {
    test(s"lemma1Dense equals lemma1 on full and partial window ranges: $name") {
      val b = 10; val nWin = 8
      val (x, y) = gen(b * nWin, 4000L)
      val sx = BasicWindows.sketch(x, b); val sy = BasicWindows.sketch(y, b)
      val cs = BasicWindows.pairCorrs(x, y, b)
      val means = (sx.map(_.mean), sy.map(_.mean))
      val stds = (sx.map(_.std), sy.map(_.std))
      for ((from, until) <- Seq((0, nWin), (0, 3), (2, 6), (5, 8), (3, 4))) {
        val dense = ExactCorrelation.lemma1Dense(means._1, stds._1, means._2, stds._2, cs, from, until)
        val expect = TestSeries.refPearson(
          x.slice(from * b, until * b), y.slice(from * b, until * b))
        assert(math.abs(dense - expect) < 1e-7, s"range [$from,$until)")
      }
    }
  }

  for ((name, gen) <- TestSeries.families) {
    test(s"directRange equals direct Pearson on slices: $name") {
      val (x, y) = gen(150, 5000L)
      for ((from, until) <- Seq((0, 150), (10, 60), (100, 150), (42, 44))) {
        val got = ExactCorrelation.directRange(x, y, from, until)
        val expect = TestSeries.refPearson(x.slice(from, until), y.slice(from, until))
        assert(math.abs(got - expect) < 1e-7, s"range [$from,$until)")
      }
    }
  }

  test("property: lemma1 equals direct Pearson on random data") {
    val gen = for {
      nWin <- Gen.choose(1, 8)
      b <- Gen.choose(2, 12)
      xs <- Gen.listOfN(nWin * b, Gen.choose(-100.0, 100.0))
      ys <- Gen.listOfN(nWin * b, Gen.choose(-100.0, 100.0))
    } yield (xs.toArray, ys.toArray, b)
    checkProp(Prop.forAll(gen) { case (x, y, b) =>
      math.abs(viaSketches(x, y, b) - TestSeries.refPearson(x, y)) < 1e-6
    })
  }
}
