package repro

import repro.SparkSpec

/** The oracle itself must both accept matching results and reject
  * mismatches — otherwise every ORACLE test above proves nothing.
  */
class OracleSpec extends SparkSpec {

  private lazy val df = {
    import spark.implicits._
    Seq((1, 10.0), (2, 20.0), (3, 30.0)).toDF("k", "v")
  }

  test("accepts an equivalent aggregation") {
    import spark.implicits._
    val agg = df.groupBy().sum("v").select($"sum(v)".as("total"))
    Oracle.assertEquivalent(agg,
      "SELECT sum(CAST(v AS DOUBLE)) AS total FROM t", "t" -> df)
  }

  test("rejects a wrong result") {
    import spark.implicits._
    val wrong = df.groupBy().sum("v").select(($"sum(v)" + 1).as("total"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT sum(CAST(v AS DOUBLE)) AS total FROM t", "t" -> df)
    }
  }

  test("rejects mismatched column sets") {
    import spark.implicits._
    val agg = df.groupBy().sum("v").select($"sum(v)".as("grand_total"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(agg,
        "SELECT sum(CAST(v AS DOUBLE)) AS total FROM t", "t" -> df)
    }
  }

  test("rejects missing rows") {
    val sql = "SELECT CAST(k AS INT) AS k, CAST(v AS DOUBLE) AS v FROM t WHERE CAST(k AS INT) < 3"
    Oracle.assertEquivalent(df.filter("k < 3"), sql, "t" -> df)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.filter("k < 2"), sql, "t" -> df)
    }
  }

  test("accepts DuckDB corr against Spark corr (the pattern the suites use)") {
    import spark.implicits._
    val pairs = Seq((1.0, 2.0), (2.0, 4.1), (3.0, 5.9), (4.0, 8.2)).toDF("x", "y")
    val sparkCorr = pairs.groupBy().agg(org.apache.spark.sql.functions.corr("x", "y").as("c"))
    Oracle.assertEquivalent(sparkCorr,
      "SELECT corr(CAST(x AS DOUBLE), CAST(y AS DOUBLE)) AS c FROM p", "p" -> pairs)
  }
}
