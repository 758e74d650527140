package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestSeries

class PruningSpec extends AnyFunSuite {

  /** Correlation matrix of a batch of random series. */
  private def corrMatrix(n: Int, len: Int, seed: Long): Array[Array[Double]] = {
    val data = repro.climate.ClimateData.series(n, len, seed)
    val m = Array.fill(n, n)(1.0)
    for (i <- 0 until n; j <- i + 1 until n) {
      val c = WindowStats.pearson(data(i), data(j))
      m(i)(j) = c; m(j)(i) = c
    }
    m
  }

  for (seed <- 1 to 10) {
    test(s"Eq 7 bounds contain the true correlation (seed $seed)") {
      val m = corrMatrix(8, 120, seed)
      for (x <- 0 until 8; y <- x + 1 until 8; z <- 0 until 8 if z != x && z != y) {
        val (lo, hi) = Pruning.bounds(m(x)(z), m(y)(z))
        assert(m(x)(y) >= lo - 1e-9 && m(x)(y) <= hi + 1e-9,
          s"c_xy=${m(x)(y)} outside [$lo,$hi] for x=$x y=$y z=$z")
      }
    }
  }

  test("bounds are symmetric in the anchor arguments") {
    val (lo1, hi1) = Pruning.bounds(0.8, -0.3)
    val (lo2, hi2) = Pruning.bounds(-0.3, 0.8)
    assert(lo1 == lo2 && hi1 == hi2)
  }

  test("perfect anchor correlation pins the bound") {
    val (lo, hi) = Pruning.bounds(1.0, 0.65)
    assert(math.abs(lo - 0.65) < 1e-12 && math.abs(hi - 0.65) < 1e-12)
  }

  test("orthogonal anchors give vacuous bounds") {
    val (lo, hi) = Pruning.bounds(0.0, 0.0)
    assert(lo == -1.0 && hi == 1.0)
  }

  for (theta <- Seq(0.3, 0.5, 0.75, 0.9); seed <- Seq(3L, 9L)) {
    test(s"pruned threshold matrix equals brute force (θ=$theta seed=$seed)") {
      val n = 12
      val m = corrMatrix(n, 150, seed)
      val pruned = Pruning.thresholdMatrix(n, (i, j) => m(i)(j), theta)
      for (i <- 0 until n; j <- 0 until n) {
        val expect = if (i == j) 1 else if (math.abs(m(i)(j)) > theta) 1 else 0
        assert(pruned.matrix(i)(j) == expect, s"cell ($i,$j)")
      }
    }
  }

  test("pruning saves exact computations when correlations are extreme") {
    // strongly clustered series: anchors decide many cells
    val n = 14
    val base = TestSeries.gaussian(200, 5)
    val data = Array.tabulate(n) { i =>
      if (i < 7) base.map(v => v + 0.01 * TestSeries.gaussian(200, 50 + i)(0))
      else base.map(v => -v + 0.01 * i)
    }
    val m = Array.fill(n, n)(1.0)
    for (i <- 0 until n; j <- i + 1 until n) {
      val c = WindowStats.pearson(data(i), data(j)); m(i)(j) = c; m(j)(i) = c
    }
    val pruned = Pruning.thresholdMatrix(n, (i, j) => m(i)(j), 0.5, anchors = 1)
    assert(pruned.inferred > 0, "expected some inferred cells")
    assert(pruned.computed + pruned.inferred >= n.toLong * (n - 1) / 2 - pruned.computed)
    // decisions still correct
    for (i <- 0 until n; j <- i + 1 until n) {
      val expect = if (math.abs(m(i)(j)) > 0.5) 1 else 0
      assert(pruned.matrix(i)(j) == expect)
    }
  }

  test("single anchor never computes more than brute force") {
    val n = 10
    val m = corrMatrix(n, 100, 7L)
    val pruned = Pruning.thresholdMatrix(n, (i, j) => m(i)(j), 0.6, anchors = 1)
    assert(pruned.computed <= n.toLong * (n - 1) / 2)
  }

  test("non-positive threshold rejected") {
    intercept[IllegalArgumentException](Pruning.thresholdMatrix(3, (_, _) => 0.5, 0.0))
  }
}
