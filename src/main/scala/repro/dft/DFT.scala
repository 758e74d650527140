package repro.dft

/** Unitary Discrete Fourier Transform (paper Equation 2), computed by the
  * direct O(k²) summation — deliberately so: the paper's efficiency claims
  * hinge on the DFT-based comparator paying O(B²) per basic window at
  * sketch time, versus TSUBASA's O(B) moment pass.
  */
object DFT {

  /** Complex DFT coefficients of a real sequence, X_f = (1/√k) Σ_i x_i e^{−j2πfi/k}.
    * Returned as (real parts, imaginary parts), f = 0 … k−1. The 1/√k
    * factor makes the transform unitary: ‖X‖₂ = ‖x‖₂ (Parseval), so
    * coefficient distances equal sequence distances when all coefficients
    * are used.
    */
  def transform(xs: Array[Double]): (Array[Double], Array[Double]) = {
    val k = xs.length
    val re = new Array[Double](k)
    val im = new Array[Double](k)
    val s = 1.0 / math.sqrt(k.toDouble)
    var f = 0
    while (f < k) {
      var sr = 0.0; var si = 0.0
      var i = 0
      while (i < k) {
        val ang = -2.0 * math.Pi * f * i / k
        sr += xs(i) * math.cos(ang)
        si += xs(i) * math.sin(ang)
        i += 1
      }
      re(f) = sr * s; im(f) = si * s
      f += 1
    }
    (re, im)
  }

  /** Squared Euclidean distance of the first n coefficients of X and Y
    * (Dist_n in the paper). n = k recovers the exact squared distance of
    * the original sequences.
    */
  def prefixDistSq(xre: Array[Double], xim: Array[Double],
                   yre: Array[Double], yim: Array[Double], n: Int): Double = {
    require(n >= 0 && n <= xre.length, s"bad coefficient count $n")
    var d = 0.0
    var f = 0
    while (f < n) {
      val dr = xre(f) - yre(f); val di = xim(f) - yim(f)
      d += dr * dr + di * di
      f += 1
    }
    d
  }
}
