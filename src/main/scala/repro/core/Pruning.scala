package repro.core

/** Correlation-inference pruning (paper §3.5, Equation 7, Algorithm 5).
  *
  * Given c_xz and c_yz, positive semidefiniteness of the 3×3 correlation
  * matrix bounds the unknown c_xy:
  *
  *   c_xz·c_yz − √((1−c_xz²)(1−c_yz²)) ≤ c_xy ≤ c_xz·c_yz + √((1−c_xz²)(1−c_yz²))
  *
  * Scanning anchors z lets the thresholded matrix cell m_xy be decided
  * (edge / non-edge) without computing c_xy whenever the bounds clear θ.
  */
object Pruning {

  /** Eq 7 bounds on c_xy from the anchor correlations c_xz, c_yz. */
  def bounds(cxz: Double, cyz: Double): (Double, Double) = {
    val r = math.sqrt(math.max(0.0, (1 - cxz * cxz) * (1 - cyz * cyz)))
    (cxz * cyz - r, cxz * cyz + r)
  }

  /** Result of the pruning pass: thresholded matrix plus work counters. */
  final case class Pruned(matrix: Array[Array[Int]], computed: Long, inferred: Long)

  /** Algorithm 5: build the thresholded matrix m_ij ∈ {0, 1} for |c| > θ
    * decisions using anchors in order 0, 1, …; each anchor's own row is
    * computed exactly, then Eq 7 marks every still-undecided cell whose
    * bounds are conclusive. Undecided cells after all anchors (or once all
    * cells are decided) are computed exactly (Compute-Rest).
    *
    * m_ij = 1 when the correlation magnitude exceeds θ (the paper treats
    * L ≥ θ or U ≤ −θ as edge; −θ ≤ L ≤ U ≤ θ as non-edge).
    *
    * @param n       number of series
    * @param corr    exact pairwise correlation oracle (only called when needed)
    * @param theta   positive threshold
    * @param anchors how many anchor rows to scan (default: all n)
    */
  def thresholdMatrix(n: Int, corr: (Int, Int) => Double, theta: Double,
                      anchors: Int = Int.MaxValue): Pruned = {
    require(theta > 0, "pruning assumes a positive threshold")
    // -1 undecided, 0 non-edge, 1 edge
    val m = Array.fill(n, n)(-1)
    var computed = 0L; var inferred = 0L
    val cache = Array.fill(n, n)(Double.NaN)
    def exact(i: Int, j: Int): Double = {
      if (cache(i)(j).isNaN) {
        val c = if (i == j) 1.0 else if (i < j) corr(i, j) else corr(j, i)
        cache(i)(j) = c; cache(j)(i) = c
        if (i != j) computed += 1
      }
      cache(i)(j)
    }
    def decide(i: Int, j: Int, v: Int): Unit = { m(i)(j) = v; m(j)(i) = v }
    var i = 0
    while (i < n) { m(i)(i) = 1; i += 1 }

    var z = 0
    var undecided = n.toLong * (n - 1) / 2
    while (z < math.min(anchors, n) && undecided > 0) {
      // anchor row computed exactly
      var k = 0
      while (k < n) {
        if (k != z && m(z)(k) == -1) {
          decide(z, k, if (math.abs(exact(z, k)) > theta) 1 else 0)
          undecided -= 1
        }
        k += 1
      }
      // infer the rest from this anchor
      var a = 0
      while (a < n) {
        if (a != z) {
          var b = a + 1
          while (b < n) {
            if (b != z && m(a)(b) == -1) {
              val (lo, hi) = bounds(exact(a, z), exact(b, z))
              if (lo >= theta || hi <= -theta) { decide(a, b, 1); inferred += 1; undecided -= 1 }
              else if (lo >= -theta && hi <= theta) { decide(a, b, 0); inferred += 1; undecided -= 1 }
            }
            b += 1
          }
        }
        a += 1
      }
      z += 1
    }
    // Compute-Rest
    var a = 0
    while (a < n) {
      var b = a + 1
      while (b < n) {
        if (m(a)(b) == -1) decide(a, b, if (math.abs(exact(a, b)) > theta) 1 else 0)
        b += 1
      }
      a += 1
    }
    Pruned(m, computed, inferred)
  }
}
