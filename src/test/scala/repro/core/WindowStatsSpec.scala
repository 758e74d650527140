package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.{PropSupport, TestSeries}

class WindowStatsSpec extends AnyFunSuite with PropSupport {

  private val eps = 1e-10

  test("mean and std of a simple window") {
    val s = WindowStats.of(Array(1.0, 2.0, 3.0, 4.0))
    assert(s.size == 4)
    assert(math.abs(s.mean - 2.5) < eps)
    assert(math.abs(s.std - math.sqrt(1.25)) < eps) // population std
  }

  test("single-point window has zero std") {
    val s = WindowStats.of(Array(7.5))
    assert(s.size == 1 && s.mean == 7.5 && s.std == 0.0)
  }

  test("constant window has zero std") {
    val s = WindowStats.of(TestSeries.constant(50, 3.14))
    assert(math.abs(s.mean - 3.14) < eps && s.std < eps)
  }

  test("empty window rejected") {
    intercept[IllegalArgumentException](WindowStats.of(Array.empty[Double]))
  }

  test("variance equals std squared") {
    val s = WindowStats.of(TestSeries.gaussian(100, 1))
    assert(math.abs(s.variance - s.std * s.std) < eps)
  }

  for ((name, gen) <- TestSeries.families; len <- Seq(2, 7, 64, 500)) {
    test(s"pearson matches independent reference: $name len=$len") {
      val (x, y) = gen(len, 42L + len)
      // 1e-6: the power-sum reference loses precision on large-offset data
      assert(math.abs(WindowStats.pearson(x, y) - TestSeries.refPearson(x, y)) < 1e-6)
    }
  }

  test("pearson of identical series is 1") {
    val x = TestSeries.gaussian(200, 9)
    assert(math.abs(WindowStats.pearson(x, x) - 1.0) < eps)
  }

  test("pearson of negated series is -1") {
    val x = TestSeries.gaussian(200, 10)
    assert(math.abs(WindowStats.pearson(x, x.map(-_)) + 1.0) < eps)
  }

  test("pearson is symmetric") {
    val (x, y) = TestSeries.correlatedPair(150, 11, 0.5)
    assert(math.abs(WindowStats.pearson(x, y) - WindowStats.pearson(y, x)) < eps)
  }

  test("pearson invariant to affine transform with positive scale") {
    val (x, y) = TestSeries.correlatedPair(150, 12, 0.5)
    val x2 = x.map(v => 3.0 * v + 100.0)
    assert(math.abs(WindowStats.pearson(x, y) - WindowStats.pearson(x2, y)) < 1e-9)
  }

  test("pearson flips sign under negative scale") {
    val (x, y) = TestSeries.correlatedPair(150, 13, 0.5)
    val x2 = x.map(v => -2.0 * v)
    assert(math.abs(WindowStats.pearson(x, y) + WindowStats.pearson(x2, y)) < 1e-9)
  }

  test("zero-variance window convention: correlation is 0") {
    val x = TestSeries.constant(30, 5.0)
    val y = TestSeries.gaussian(30, 14)
    assert(WindowStats.pearson(x, y) == 0.0)
    assert(WindowStats.pearson(y, x) == 0.0)
  }

  test("misaligned windows rejected") {
    intercept[IllegalArgumentException](
      WindowStats.pearson(new Array[Double](3), new Array[Double](4)))
  }

  test("covariance matches definition") {
    val (x, y) = TestSeries.correlatedPair(80, 15, 0.7)
    val sx = WindowStats.of(x); val sy = WindowStats.of(y)
    val expected = x.indices.map(i => (x(i) - sx.mean) * (y(i) - sy.mean)).sum / x.length
    assert(math.abs(WindowStats.covariance(x, y, sx, sy) - expected) < eps)
  }

  test("property: pearson always in [-1, 1]") {
    checkProp(Prop.forAll(Gen.listOfN(20, Gen.choose(-1e3, 1e3)),
      Gen.listOfN(20, Gen.choose(-1e3, 1e3))) { (xs, ys) =>
      val c = WindowStats.pearson(xs.toArray, ys.toArray)
      c >= -1.0 - 1e-9 && c <= 1.0 + 1e-9
    })
  }

  test("property: mean bounded by min/max") {
    checkProp(Prop.forAll(Gen.nonEmptyListOf(Gen.choose(-1e6, 1e6))) { xs =>
      val s = WindowStats.of(xs.toArray)
      s.mean >= xs.min - 1e-6 && s.mean <= xs.max + 1e-6
    })
  }
}
