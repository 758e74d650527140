package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SimilarityRatioSpec extends AnyFunSuite {

  test("paper's worked example gives 2/3") {
    val a = Array(Array(1, 1, 0), Array(1, 1, 1), Array(0, 1, 1))
    val b = Array(Array(1, 0, 0), Array(0, 1, 1), Array(0, 1, 1))
    assert(math.abs(SimilarityRatio(a, b) - 2.0 / 3.0) < 1e-12)
  }

  test("identical matrices have ratio 1") {
    val a = Array(Array(1, 1, 0), Array(1, 1, 1), Array(0, 1, 1))
    assert(SimilarityRatio(a, a) == 1.0)
  }

  test("fully-different off-diagonals have ratio 0") {
    val a = Array(Array(1, 1, 1), Array(1, 1, 1), Array(1, 1, 1))
    val b = Array(Array(1, 0, 0), Array(0, 1, 0), Array(0, 0, 1))
    assert(SimilarityRatio(a, b) == 0.0)
  }

  test("diagonal is ignored") {
    val a = Array(Array(0, 1), Array(1, 0)) // weird diagonal, same off-diagonal
    val b = Array(Array(1, 1), Array(1, 1))
    assert(SimilarityRatio(a, b) == 1.0)
  }

  test("ratio is symmetric") {
    val a = Array(Array(1, 1, 0), Array(1, 1, 1), Array(0, 1, 1))
    val b = Array(Array(1, 0, 1), Array(0, 1, 1), Array(1, 1, 1))
    assert(SimilarityRatio(a, b) == SimilarityRatio(b, a))
  }

  test("networks route through adjacency") {
    val m = Array(Array(1.0, 0.9, 0.1), Array(0.9, 1.0, 0.2), Array(0.1, 0.2, 1.0))
    val n1 = Network.fromMatrix(m, 0.5)
    val n2 = Network.fromMatrix(m, 0.05)
    // n1 has edge (0,1); n2 has all three edges → they differ in 2 of 3 cells
    assert(math.abs(SimilarityRatio.ofNetworks(n1, n2) - 1.0 / 3.0) < 1e-12)
  }

  test("mismatched sizes rejected") {
    intercept[IllegalArgumentException](
      SimilarityRatio(Array(Array(1, 0), Array(0, 1)), Array(Array(1))))
  }

  test("trivial 1x1 rejected (n > 1 required)") {
    intercept[IllegalArgumentException](SimilarityRatio(Array(Array(1)), Array(Array(1))))
  }
}
