package repro.core

import org.scalatest.funsuite.AnyFunSuite

class NetworkSpec extends AnyFunSuite {

  private val m = Array(
    Array(1.0, 0.9, 0.2, -0.5),
    Array(0.9, 1.0, 0.8, 0.1),
    Array(0.2, 0.8, 1.0, 0.76),
    Array(-0.5, 0.1, 0.76, 1.0))

  test("fromMatrix keeps only strictly-above-threshold edges") {
    val net = Network.fromMatrix(m, 0.75)
    assert(net.edgeCount == 3)
    assert(net.edges.map(e => (e._1, e._2)).toSet == Set((0, 1), (1, 2), (2, 3)))
  }

  test("edge weights carry the correlation") {
    val net = Network.fromMatrix(m, 0.75)
    assert(net.edges.find(e => e._1 == 0 && e._2 == 1).get._3 == 0.9)
  }

  test("threshold is strict: equal correlation is not an edge") {
    val net = Network.fromMatrix(m, 0.9)
    assert(!net.edges.exists(e => e._1 == 0 && e._2 == 1))
  }

  test("negative thresholds admit anti-correlated edges") {
    val net = Network.fromMatrix(m, -0.6)
    assert(net.edgeCount == 6) // all pairs: all correlations > −0.6
  }

  test("adjacency has unit diagonal and symmetric edges") {
    val a = Network.fromMatrix(m, 0.75).adjacency
    for (i <- 0 until 4) assert(a(i)(i) == 1)
    for (i <- 0 until 4; j <- 0 until 4) assert(a(i)(j) == a(j)(i))
    assert(a(0)(1) == 1 && a(0)(2) == 0)
  }

  test("degrees count incident edges") {
    val net = Network.fromMatrix(m, 0.75)
    assert(net.degrees.toSeq == Seq(1, 2, 2, 1))
  }

  test("fromPairs agrees with fromMatrix") {
    val a = Network.fromMatrix(m, 0.5)
    val b = Network.fromPairs(4, (i, j) => m(i)(j), 0.5)
    assert(a.edges == b.edges)
  }

  test("empty network when threshold is 1") {
    assert(Network.fromMatrix(m, 1.0).edgeCount == 0)
  }

  test("single-node-pair matrix") {
    val net = Network.fromMatrix(Array(Array(1.0, 0.8), Array(0.8, 1.0)), 0.5)
    assert(net.edgeCount == 1 && net.nNodes == 2)
  }
}
