package repro.dft

import org.scalatest.funsuite.AnyFunSuite
import repro.TestSeries

class DFTSpec extends AnyFunSuite {

  private val tol = 1e-9

  for (k <- Seq(1, 2, 3, 8, 16, 50, 128)) {
    test(s"Parseval: unitary DFT preserves the L2 norm (k=$k)") {
      val x = TestSeries.gaussian(k, 10L + k)
      val (re, im) = DFT.transform(x)
      val normX = x.map(v => v * v).sum
      val normF = re.indices.map(f => re(f) * re(f) + im(f) * im(f)).sum
      assert(math.abs(normX - normF) < tol)
    }
  }

  for (k <- Seq(2, 5, 16, 64)) {
    test(s"distance preservation: full-coefficient distance equals raw distance (k=$k)") {
      val x = TestSeries.gaussian(k, 20L + k)
      val y = TestSeries.gaussian(k, 21L + k)
      val (xr, xi) = DFT.transform(x)
      val (yr, yi) = DFT.transform(y)
      val raw = x.indices.map(i => (x(i) - y(i)) * (x(i) - y(i))).sum
      assert(math.abs(DFT.prefixDistSq(xr, xi, yr, yi, k) - raw) < tol)
    }
  }

  test("DC coefficient is the scaled sum") {
    val x = Array(1.0, 2.0, 3.0, 4.0)
    val (re, im) = DFT.transform(x)
    assert(math.abs(re(0) - 10.0 / 2.0) < tol) // Σx/√4
    assert(math.abs(im(0)) < tol)
  }

  test("DC coefficient of a zero-mean sequence is zero") {
    val x = TestSeries.gaussian(32, 3)
    val mean = x.sum / x.length
    val centered = x.map(_ - mean)
    val (re, im) = DFT.transform(centered)
    assert(math.abs(re(0)) < tol && math.abs(im(0)) < tol)
  }

  test("conjugate symmetry for real input: X[k−f] = conj(X[f])") {
    val k = 16
    val x = TestSeries.gaussian(k, 4)
    val (re, im) = DFT.transform(x)
    for (f <- 1 until k) {
      assert(math.abs(re(k - f) - re(f)) < tol, s"re f=$f")
      assert(math.abs(im(k - f) + im(f)) < tol, s"im f=$f")
    }
  }

  test("linearity") {
    val k = 24
    val x = TestSeries.gaussian(k, 5)
    val y = TestSeries.gaussian(k, 6)
    val z = x.indices.map(i => 2.0 * x(i) - 3.0 * y(i)).toArray
    val (xr, xi) = DFT.transform(x)
    val (yr, yi) = DFT.transform(y)
    val (zr, zi) = DFT.transform(z)
    for (f <- 0 until k) {
      assert(math.abs(zr(f) - (2 * xr(f) - 3 * yr(f))) < tol)
      assert(math.abs(zi(f) - (2 * xi(f) - 3 * yi(f))) < tol)
    }
  }

  test("zero vector transforms to zero") {
    val (re, im) = DFT.transform(new Array[Double](10))
    assert(re.forall(_ == 0.0) && im.forall(_ == 0.0))
  }

  test("prefix distance is monotone non-decreasing in the coefficient count") {
    val k = 40
    val x = TestSeries.gaussian(k, 7)
    val y = TestSeries.gaussian(k, 8)
    val (xr, xi) = DFT.transform(x)
    val (yr, yi) = DFT.transform(y)
    val dists = (0 to k).map(n => DFT.prefixDistSq(xr, xi, yr, yi, n))
    assert(dists.zip(dists.tail).forall { case (a, b) => b >= a - tol })
    assert(dists.head == 0.0)
  }

  test("prefix distance with bad n rejected") {
    val (re, im) = DFT.transform(new Array[Double](4))
    intercept[IllegalArgumentException](DFT.prefixDistSq(re, im, re, im, 5))
  }

  test("pure sinusoid concentrates energy in its frequency bin") {
    val k = 64
    val x = Array.tabulate(k)(i => math.cos(2 * math.Pi * 5 * i / k))
    val (re, im) = DFT.transform(x)
    val energy = re.indices.map(f => re(f) * re(f) + im(f) * im(f))
    // bins 5 and k−5 carry all the energy
    val inBins = energy(5) + energy(k - 5)
    assert(inBins / energy.sum > 0.999)
  }
}
