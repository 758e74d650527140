package repro.spark

import org.apache.spark.sql.Row
import repro.SparkSpec
import repro.climate.ClimateData
import repro.core.{BasicWindows, WindowStats}
import repro.dft.ApproxCorrelation

/** Spark sketching must agree bit-for-bit (to float tolerance) with the
  * local reference implementations on identical generated data.
  */
class SketcherSpec extends SparkSpec {

  private val n = 6
  private val len = 120
  private val b = 20
  private lazy val data = ClimateData.series(n, len, seed = 31L)
  private lazy val raw = ClimateData.toDF(spark, data).cache()

  test("toDF long format has n*len rows and the right columns") {
    assert(raw.columns.toSeq == Seq("series_id", "t", "value"))
    assert(raw.count() == n.toLong * len)
  }

  test("toDF values match the generator matrix") {
    val sample = raw.filter("series_id = 2 AND t < 5").orderBy("t")
      .collect().map(_.getDouble(2))
    assert(sample.zip(data(2).take(5)).forall { case (a, c) => a == c })
  }

  test("seriesWindowStats matches local window sketches") {
    val stats = Sketcher.seriesWindowStats(raw, b).collect()
    assert(stats.length == n * (len / b))
    stats.foreach { r =>
      val sid = r.getAs[Int]("series_id")
      val w = r.getAs[Long]("w").toInt
      val local = WindowStats.of(BasicWindows.split(data(sid), b)(w))
      assert(r.getAs[Int]("b") == b)
      assert(math.abs(r.getAs[Double]("mean") - local.mean) < 1e-9, s"mean s=$sid w=$w")
      assert(math.abs(r.getAs[Double]("std") - local.std) < 1e-9, s"std s=$sid w=$w")
    }
  }

  test("seriesWindowStats value arrays are time-ordered") {
    val r = Sketcher.seriesWindowStats(raw, b)
      .filter("series_id = 1 AND w = 2").collect().head
    val vals = r.getAs[scala.collection.Seq[Double]]("values")
    assert(vals.toSeq == data(1).slice(2 * b, 3 * b).toSeq)
  }

  test("seriesWindowStats drops trailing partial windows") {
    val stats = Sketcher.seriesWindowStats(raw, 50).collect() // 120 = 2×50 + 20
    assert(stats.length == n * 2)
  }

  test("pairSketch covers exactly the upper triangle for every window") {
    val sketch = Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b)).collect()
    assert(sketch.length == n * (n - 1) / 2 * (len / b))
    assert(sketch.forall(r => r.getAs[Int]("i") < r.getAs[Int]("j")))
  }

  test("pairSketch c_j matches local per-window Pearson") {
    val sketch = Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b)).collect()
    sketch.foreach { r =>
      val i = r.getAs[Int]("i"); val j = r.getAs[Int]("j"); val w = r.getAs[Long]("w").toInt
      val local = BasicWindows.pairCorrs(data(i), data(j), b)(w)
      assert(math.abs(r.getAs[Double]("c") - local) < 1e-9, s"c i=$i j=$j w=$w")
    }
  }

  test("pairSketch carries both sides' window stats") {
    val sketch = Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b)).collect()
    sketch.foreach { r =>
      val i = r.getAs[Int]("i"); val j = r.getAs[Int]("j"); val w = r.getAs[Long]("w").toInt
      val li = WindowStats.of(BasicWindows.split(data(i), b)(w))
      val lj = WindowStats.of(BasicWindows.split(data(j), b)(w))
      assert(math.abs(r.getAs[Double]("mean_x") - li.mean) < 1e-9)
      assert(math.abs(r.getAs[Double]("std_y") - lj.std) < 1e-9)
    }
  }

  test("withDft + pairSketch d_sq matches local DFT prefix distances") {
    val nc = (0.75 * b).toInt
    val sketch = Sketcher.pairSketch(Sketcher.withDft(Sketcher.seriesWindowStats(raw, b)), nc).collect()
    sketch.foreach { r =>
      val i = r.getAs[Int]("i"); val j = r.getAs[Int]("j"); val w = r.getAs[Long]("w").toInt
      val wi = BasicWindows.split(data(i), b)(w)
      val wj = BasicWindows.split(data(j), b)(w)
      val local = ApproxCorrelation.windowDistSq(
        ApproxCorrelation.sketchWindow(wi), ApproxCorrelation.sketchWindow(wj), nc)
      assert(math.abs(r.getAs[Double]("d_sq") - local) < 1e-9, s"d_sq i=$i j=$j w=$w")
    }
  }

  test("full-coefficient d_sq reproduces c via Equation 3") {
    val sketch = Sketcher.pairSketch(Sketcher.withDft(Sketcher.seriesWindowStats(raw, b)), b).collect()
    sketch.foreach { r =>
      val c = r.getAs[Double]("c")
      val viaDft = 1.0 - r.getAs[Double]("d_sq") / 2.0
      assert(math.abs(c - viaDft) < 1e-7)
    }
  }
}
