package repro.spark

import repro.{Oracle, SparkSpec, TestSeries}
import repro.climate.ClimateData

class SparkBaselineSpec extends SparkSpec {

  private val n = 5
  private val len = 80
  private lazy val data = ClimateData.series(n, len, seed = 51L)
  private lazy val raw = ClimateData.toDF(spark, data).cache()

  test("baseline equals local direct Pearson on the full range") {
    val rows = SparkBaseline.correlationMatrix(raw, 0, len - 1).collect()
    assert(rows.length == n * (n - 1) / 2)
    rows.foreach { r =>
      val i = r.getAs[Int]("i"); val j = r.getAs[Int]("j")
      assert(math.abs(r.getAs[Double]("corr") - TestSeries.refPearson(data(i), data(j))) < 1e-9)
    }
  }

  test("baseline on a sub-range") {
    val rows = SparkBaseline.correlationMatrix(raw, 10, 59).collect()
    rows.foreach { r =>
      val i = r.getAs[Int]("i"); val j = r.getAs[Int]("j")
      val expect = TestSeries.refPearson(data(i).slice(10, 60), data(j).slice(10, 60))
      assert(math.abs(r.getAs[Double]("corr") - expect) < 1e-9)
    }
  }

  test("ORACLE: baseline equals DuckDB corr") {
    Oracle.assertEquivalent(
      SparkBaseline.correlationMatrix(raw, 0, len - 1),
      """SELECT CAST(a.series_id AS INT) AS i, CAST(b.series_id AS INT) AS j,
        |       corr(CAST(a.value AS DOUBLE), CAST(b.value AS DOUBLE)) AS corr
        |FROM raw a JOIN raw b
        |  ON a.t = b.t AND CAST(a.series_id AS INT) < CAST(b.series_id AS INT)
        |GROUP BY 1, 2""".stripMargin,
      "raw" -> raw)
  }

  test("ORACLE: baseline on a time window equals DuckDB") {
    Oracle.assertEquivalent(
      SparkBaseline.correlationMatrix(raw, 20, 69),
      """SELECT CAST(a.series_id AS INT) AS i, CAST(b.series_id AS INT) AS j,
        |       corr(CAST(a.value AS DOUBLE), CAST(b.value AS DOUBLE)) AS corr
        |FROM raw a JOIN raw b
        |  ON a.t = b.t AND CAST(a.series_id AS INT) < CAST(b.series_id AS INT)
        |WHERE CAST(a.t AS INT) BETWEEN 20 AND 69
        |GROUP BY 1, 2""".stripMargin,
      "raw" -> raw)
  }

  test("baseline and sketch-based exact agree (end-to-end cross-check)") {
    val b = 20
    val sketch = Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b))
    val viaSketch = SparkExact.correlationMatrix(sketch, 0, len / b - 1).collect()
      .map(r => ((r.getAs[Int]("i"), r.getAs[Int]("j")), r.getAs[Double]("corr"))).toMap
    SparkBaseline.correlationMatrix(raw, 0, len - 1).collect().foreach { r =>
      val key = (r.getAs[Int]("i"), r.getAs[Int]("j"))
      assert(math.abs(viaSketch(key) - r.getAs[Double]("corr")) < 1e-9, s"$key")
    }
  }
}
