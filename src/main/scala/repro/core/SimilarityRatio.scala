package repro.core

/** Correlation similarity ratio D_p (paper §4.1, after [26]): the fraction
  * of identical off-diagonal cells in two boolean adjacency matrices,
  *
  *   D_p(A, B) = 2 Σ_{i<j} (1 − |a_ij − b_ij|) / (n(n−1))
  *
  * D_p = 1 means identical edge sets; the paper's worked example of two
  * 3×3 matrices differing in one off-diagonal pair gives 2/3.
  */
object SimilarityRatio {

  def apply(a: Array[Array[Int]], b: Array[Array[Int]]): Double = {
    val n = a.length
    require(n == b.length && n > 1, "matrices must be same size, n > 1")
    var same = 0
    var i = 0
    while (i < n) {
      require(a(i).length == n && b(i).length == n, "matrices must be square")
      var j = i + 1
      while (j < n) {
        if (a(i)(j) == b(i)(j)) same += 1
        j += 1
      }
      i += 1
    }
    2.0 * same / (n.toLong * (n - 1))
  }

  def ofNetworks(a: Network, b: Network): Double = apply(a.adjacency, b.adjacency)
}
