package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestSeries

/** §3.1.1's arbitrary query windows: correlation on [start, end] where the
  * endpoints fall anywhere inside basic windows must equal direct Pearson
  * on the raw slice.
  */
class ArbitraryWindowSpec extends AnyFunSuite {

  private val tol = 1e-9
  private val b = 20
  private val len = 200

  private def fixture(seed: Long) = {
    val (x, y) = TestSeries.correlatedPair(len, seed, 0.5)
    val sx = BasicWindows.sketch(x, b)
    val sy = BasicWindows.sketch(y, b)
    val cs = BasicWindows.pairCorrs(x, y, b)
    (x, y, sx, sy, cs)
  }

  private def check(x: Array[Double], y: Array[Double], sx: Array[WindowStats],
                    sy: Array[WindowStats], cs: Array[Double], start: Int, end: Int): Unit = {
    val got = ExactCorrelation.arbitrary(x, y, b, sx, sy, cs, start, end)
    val expect = TestSeries.refPearson(x.slice(start, end + 1), y.slice(start, end + 1))
    assert(math.abs(got - expect) < tol, s"range [$start,$end]")
  }

  // systematic endpoint placements relative to window boundaries
  val cases: Seq[(String, Int, Int)] = Seq(
    ("aligned both ends", 20, 159),
    ("full series", 0, len - 1),
    ("unaligned start only", 7, 159),
    ("unaligned end only", 20, 147),
    ("unaligned both ends", 13, 171),
    ("start at window end", 19, 149),
    ("end at window start", 20, 160),
    ("inside a single window", 25, 33),
    ("spanning exactly two partials", 15, 24),
    ("one point", 50, 50),
    ("two points across a boundary", 19, 20),
    ("head partial of one point", 39, 99),
    ("tail partial of one point", 40, 100),
  )

  for ((name, s, e) <- cases) {
    test(s"arbitrary window: $name [$s,$e]") {
      val (x, y, sx, sy, cs) = fixture(77L)
      check(x, y, sx, sy, cs, s, e)
    }
  }

  for (seed <- 1 to 15) {
    test(s"arbitrary window: random range (seed $seed)") {
      val (x, y, sx, sy, cs) = fixture(100L + seed)
      val r = new scala.util.Random(seed)
      val s = r.nextInt(len - 3)
      val e = s + 2 + r.nextInt(len - s - 3)
      check(x, y, sx, sy, cs, s, e)
    }
  }

  test("coverage decomposition: aligned query uses only full windows") {
    val cov = BasicWindows.coverage(20, 159, b)
    assert(cov.headRange.isEmpty && cov.tailRange.isEmpty && cov.fullWindows == (1 until 8))
  }

  test("coverage decomposition: unaligned query gets head and tail partials") {
    val cov = BasicWindows.coverage(13, 171, b)
    assert(cov.headRange.contains((13, 19)))
    assert(cov.fullWindows == (1 until 8))
    assert(cov.tailRange.contains((160, 171)))
  }

  test("coverage decomposition: sub-window query is a single head range") {
    val cov = BasicWindows.coverage(25, 33, b)
    assert(cov.headRange.contains((25, 33)) && cov.fullWindows.isEmpty && cov.tailRange.isEmpty)
  }

  test("coverage rejects inverted ranges") {
    intercept[IllegalArgumentException](BasicWindows.coverage(10, 5, b))
  }
}
