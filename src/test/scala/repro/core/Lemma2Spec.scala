package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestSeries

/** Lemma 2: sliding the query window by one basic window via the
  * incremental update must equal both (a) Lemma 1 recomputed from scratch
  * on the new window's sketches and (b) direct Pearson on the new raw
  * window.
  */
class Lemma2Spec extends AnyFunSuite {

  private val tol = 1e-8

  /** Slide a (x, y) stream through a window of nWin basic windows of size
    * b, checking the invariant after every step.
    */
  private def checkSlides(x: Array[Double], y: Array[Double], b: Int, nWin: Int, label: String): Unit = {
    val xs = BasicWindows.split(x, b); val ys = BasicWindows.split(y, b)
    val stats = xs.map(WindowStats.of); val statsY = ys.map(WindowStats.of)
    val cs = xs.indices.map(w => WindowStats.pearson(xs(w), ys(w)))
    var terms = ExactCorrelation.terms(
      stats.take(nWin).toIndexedSeq, statsY.take(nWin).toIndexedSeq, cs.take(nWin).toIndexedSeq)
    var lo = 0
    while (lo + nWin < xs.length) {
      terms = IncrementalCorrelation.slide(terms,
        stats(lo), statsY(lo), cs(lo),
        stats(lo + nWin), statsY(lo + nWin), cs(lo + nWin))
      lo += 1
      val fromScratch = ExactCorrelation.lemma1(
        stats.slice(lo, lo + nWin).toIndexedSeq, statsY.slice(lo, lo + nWin).toIndexedSeq,
        cs.slice(lo, lo + nWin).toIndexedSeq)
      val direct = TestSeries.refPearson(
        x.slice(lo * b, (lo + nWin) * b), y.slice(lo * b, (lo + nWin) * b))
      assert(math.abs(terms.corr - fromScratch) < tol, s"$label slide $lo vs lemma1")
      assert(math.abs(terms.corr - direct) < tol, s"$label slide $lo vs direct")
    }
  }

  for {
    (name, gen) <- TestSeries.families
    (b, nWin) <- Seq((5, 4), (10, 3), (20, 5))
  } {
    test(s"lemma2 slide chain equals recomputation: $name B=$b n_s=$nWin") {
      val (x, y) = gen(b * (nWin + 6), 500L + b * nWin)
      checkSlides(x, y, b, nWin, name)
    }
  }

  test("long slide chain stays numerically stable (200 slides)") {
    val (x, y) = TestSeries.correlatedPair(10 * (8 + 200), 99L, 0.7)
    checkSlides(x, y, 10, 8, "long-chain")
  }

  test("slide with UNEQUAL evict/add window sizes") {
    val r = new scala.util.Random(4)
    val sizes = Array.fill(12)(4 + r.nextInt(20))
    val total = sizes.sum
    val (x, y) = TestSeries.correlatedPair(total, 5L, 0.5)
    val offs = sizes.scanLeft(0)(_ + _)
    def win(a: Array[Double], i: Int) = a.slice(offs(i), offs(i + 1))
    val sx = sizes.indices.map(i => WindowStats.of(win(x, i)))
    val sy = sizes.indices.map(i => WindowStats.of(win(y, i)))
    val cs = sizes.indices.map(i => WindowStats.pearson(win(x, i), win(y, i)))
    val nWin = 5
    var terms = ExactCorrelation.terms(sx.take(nWin), sy.take(nWin), cs.take(nWin))
    var lo = 0
    while (lo + nWin < sizes.length) {
      terms = IncrementalCorrelation.slide(terms, sx(lo), sy(lo), cs(lo),
        sx(lo + nWin), sy(lo + nWin), cs(lo + nWin))
      lo += 1
      val direct = TestSeries.refPearson(
        x.slice(offs(lo), offs(lo + nWin)), y.slice(offs(lo), offs(lo + nWin)))
      assert(math.abs(terms.corr - direct) < tol, s"unequal slide $lo")
    }
  }

  test("append grows the window like lemma1 on the extended range") {
    val b = 8
    val (x, y) = TestSeries.correlatedPair(b * 10, 6L, 0.6)
    val xs = BasicWindows.split(x, b); val ys = BasicWindows.split(y, b)
    val sx = xs.map(WindowStats.of); val sy = ys.map(WindowStats.of)
    val cs = xs.indices.map(w => WindowStats.pearson(xs(w), ys(w)))
    var terms = ExactCorrelation.terms(sx.take(1).toIndexedSeq, sy.take(1).toIndexedSeq, cs.take(1).toIndexedSeq)
    for (w <- 1 until xs.length) {
      terms = IncrementalCorrelation.append(terms, sx(w), sy(w), cs(w))
      val direct = TestSeries.refPearson(x.take((w + 1) * b), y.take((w + 1) * b))
      assert(math.abs(terms.corr - direct) < tol, s"append $w")
    }
  }

  test("slide then append composes") {
    val b = 6
    val (x, y) = TestSeries.correlatedPair(b * 12, 7L, 0.3)
    val xs = BasicWindows.split(x, b); val ys = BasicWindows.split(y, b)
    val sx = xs.map(WindowStats.of); val sy = ys.map(WindowStats.of)
    val cs = xs.indices.map(w => WindowStats.pearson(xs(w), ys(w)))
    // window [0,3) → slide to [1,4) → append 4 → window [1,5)
    var t = ExactCorrelation.terms(sx.take(3).toIndexedSeq, sy.take(3).toIndexedSeq, cs.take(3).toIndexedSeq)
    t = IncrementalCorrelation.slide(t, sx(0), sy(0), cs(0), sx(3), sy(3), cs(3))
    t = IncrementalCorrelation.append(t, sx(4), sy(4), cs(4))
    val direct = TestSeries.refPearson(x.slice(b, 5 * b), y.slice(b, 5 * b))
    assert(math.abs(t.corr - direct) < tol)
  }

  test("grand mean tracks the true window mean through slides") {
    val b = 10; val nWin = 4
    val (x, y) = TestSeries.correlatedPair(b * 9, 8L, 0.5)
    val xs = BasicWindows.split(x, b); val ys = BasicWindows.split(y, b)
    val sx = xs.map(WindowStats.of); val sy = ys.map(WindowStats.of)
    val cs = xs.indices.map(w => WindowStats.pearson(xs(w), ys(w)))
    var t = ExactCorrelation.terms(sx.take(nWin).toIndexedSeq, sy.take(nWin).toIndexedSeq, cs.take(nWin).toIndexedSeq)
    for (lo <- 0 until xs.length - nWin) {
      t = IncrementalCorrelation.slide(t, sx(lo), sy(lo), cs(lo), sx(lo + nWin), sy(lo + nWin), cs(lo + nWin))
      val trueMean = x.slice((lo + 1) * b, (lo + 1 + nWin) * b).sum / (nWin * b)
      assert(math.abs(t.grandMeanX - trueMean) < tol, s"grand mean after slide $lo")
    }
  }
}
