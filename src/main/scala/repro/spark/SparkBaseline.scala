package repro.spark

import org.apache.spark.sql.{DataFrame, functions => F}

/** The paper's baseline: all-pair Pearson correlation computed directly
  * from raw data at query time (Equation 1), with no sketching. On Spark
  * this is a self-join of the raw long-format table on the timestamp —
  * the shuffle materializes N(N−1)/2 · l* rows, which is precisely the
  * O(l*·N²) query cost the baseline pays in Figure 5c.
  */
object SparkBaseline {

  /** Per-pair correlation over raw timestamps in [tLo, tHi] (inclusive).
    * Output: (i, j, corr).
    */
  def correlationMatrix(raw: DataFrame, tLo: Long, tHi: Long): DataFrame = {
    val window = raw.filter(F.col("t").between(tLo, tHi))
    val left = window.select(F.col("series_id").as("i"), F.col("t"), F.col("value").as("x"))
    val right = window.select(F.col("series_id").as("j"), F.col("t").as("t2"), F.col("value").as("y"))
    left
      .join(right, F.col("t") === F.col("t2") && F.col("i") < F.col("j"))
      .groupBy("i", "j")
      .agg(F.corr("x", "y").as("corr"))
  }
}
