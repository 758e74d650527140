package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestSeries
import repro.climate.ClimateData

/** SlidingNetwork must, after every ingest, report exactly the direct
  * Pearson correlations of the last n_s·B raw points of every pair.
  */
class SlidingNetworkSpec extends AnyFunSuite {

  private val tol = 1e-8

  private def windowsOf(data: Array[Array[Double]], b: Int, w: Int): Array[Array[Double]] =
    data.map(s => java.util.Arrays.copyOfRange(s, w * b, (w + 1) * b))

  for ((n, b, nWin) <- Seq((3, 8, 3), (5, 10, 4), (8, 5, 6))) {
    test(s"matrix equals direct Pearson after every ingest (n=$n B=$b n_s=$nWin)") {
      val totalWin = nWin + 4
      val data = ClimateData.series(n, totalWin * b, seed = 11L * n + b)
      val net = new SlidingNetwork(n, nWin)
      for (w <- 0 until totalWin) {
        net.ingest(windowsOf(data, b, w))
        val lo = math.max(0, (w + 1) * b - nWin * b)
        val hi = (w + 1) * b
        val m = net.matrix()
        for (i <- 0 until n; j <- i + 1 until n) {
          val expect = TestSeries.refPearson(
            data(i).slice(lo, hi), data(j).slice(lo, hi))
          assert(math.abs(m(i)(j) - expect) < tol, s"window $w pair ($i,$j)")
          assert(m(i)(j) == m(j)(i))
        }
      }
    }
  }

  test("full flag flips once n_s windows arrived") {
    val data = ClimateData.series(3, 40, 1L)
    val net = new SlidingNetwork(3, 3)
    assert(!net.full && net.size == 0)
    net.ingest(windowsOf(data, 10, 0))
    assert(!net.full && net.size == 1)
    net.ingest(windowsOf(data, 10, 1))
    net.ingest(windowsOf(data, 10, 2))
    assert(net.full && net.size == 3)
    net.ingest(windowsOf(data, 10, 3))
    assert(net.full && net.size == 3) // sliding, not growing
  }

  test("pairIndex enumerates the upper triangle without collisions") {
    val net = new SlidingNetwork(7, 2)
    val idx = for (i <- 0 until 7; j <- i + 1 until 7) yield net.pairIndex(i, j)
    assert(idx.sorted == (0 until 21))
  }

  test("network thresholding matches Network.fromMatrix") {
    val data = ClimateData.series(5, 60, 3L)
    val net = new SlidingNetwork(5, 3)
    for (w <- 0 until 3) net.ingest(windowsOf(data, 20, w))
    val viaMatrix = Network.fromMatrix(net.matrix(), 0.5)
    assert(net.network(0.5).edges == viaMatrix.edges)
  }

  test("mismatched window counts rejected") {
    val net = new SlidingNetwork(3, 2)
    intercept[IllegalArgumentException](net.ingest(Array(Array(1.0), Array(2.0))))
  }

  test("unequal window lengths rejected") {
    val net = new SlidingNetwork(2, 2)
    intercept[IllegalArgumentException](net.ingest(Array(Array(1.0, 2.0), Array(3.0))))
  }

  test("corr before any ingest rejected") {
    val net = new SlidingNetwork(2, 2)
    intercept[IllegalArgumentException](net.corr(0, 1))
  }
}
