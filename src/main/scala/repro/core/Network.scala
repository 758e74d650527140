package repro.core

/** A climate network: nodes 0..n−1 and the undirected edges whose
  * correlation exceeded the user threshold θ (paper §2.1). Edge weights
  * keep the correlation so thresholds can be re-applied cheaply.
  */
final case class Network(nNodes: Int, edges: Vector[(Int, Int, Double)]) {

  /** Number of undirected edges. */
  def edgeCount: Int = edges.size

  /** Boolean adjacency matrix (diagonal set to 1, matching the paper's
    * similarity-ratio examples which have 1s on the diagonal).
    */
  def adjacency: Array[Array[Int]] = {
    val a = Array.ofDim[Int](nNodes, nNodes)
    var i = 0
    while (i < nNodes) { a(i)(i) = 1; i += 1 }
    edges.foreach { case (u, v, _) => a(u)(v) = 1; a(v)(u) = 1 }
    a
  }

  /** Degree of each node. */
  def degrees: Array[Int] = {
    val d = new Array[Int](nNodes)
    edges.foreach { case (u, v, _) => d(u) += 1; d(v) += 1 }
    d
  }
}

object Network {

  /** Threshold a symmetric correlation matrix into a network. An edge is
    * kept when corr > θ (strictly, per Algorithm 2's `if c > θ`).
    */
  def fromMatrix(m: Array[Array[Double]], theta: Double): Network = {
    val n = m.length
    val es = Vector.newBuilder[(Int, Int, Double)]
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        if (m(i)(j) > theta) es += ((i, j, m(i)(j)))
        j += 1
      }
      i += 1
    }
    Network(n, es.result())
  }

  /** Build from a pairwise correlation function (upper triangle only). */
  def fromPairs(n: Int, corr: (Int, Int) => Double, theta: Double): Network = {
    val es = Vector.newBuilder[(Int, Int, Double)]
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        val c = corr(i, j)
        if (c > theta) es += ((i, j, c))
        j += 1
      }
      i += 1
    }
    Network(n, es.result())
  }
}
