package repro.climate

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Synthetic climate-like time-series — the offline substitute for the
  * paper's NCEA (NOAA hourly, 157 stations × ~8760 points) and Berkeley
  * Earth (1°×1° gridded daily, 18,638 × 3,652) data sets (DESIGN.md §4).
  *
  * Each node sits on a lat-lon grid and observes a mixture of shared
  * low-frequency climate modes (seasonal + annual harmonics + a slow
  * ENSO-like oscillation + trend) with smoothly location-dependent
  * weights, plus AR(1) noise and a slow amplitude modulation. The
  * location-dependent mixing yields a non-trivial correlation topology
  * (near nodes correlate strongly, far nodes weakly); the AR(1) noise and
  * modulation spread energy across the spectrum, making the series
  * "uncooperative" in the paper's sense — DFT prefixes need most
  * coefficients to approximate distances well, which is exactly the
  * regime Figure 5a demonstrates.
  *
  * Generation is a deterministic function of (n, len, seed) so the local
  * reference arrays, the Spark DataFrames, and the DuckDB oracle all see
  * identical values.
  */
object ClimateData {

  /** splitmix64-style hash → uniform double in [−1, 1). */
  private def noise(seed: Long, i: Long, t: Long): Double = {
    var h = seed ^ (i * 0x9E3779B97F4A7C15L) ^ (t * 0xC2B2AE3D27D4EB4FL)
    h ^= h >>> 33; h *= 0xFF51AFD7ED558CCDL
    h ^= h >>> 33; h *= 0xC4CEB9FE1A85EC53L
    h ^= h >>> 33
    (h >>> 11).toDouble / (1L << 52).toDouble - 1.0
  }

  /** Generate `n` series of length `len`. Row i is node i's series. */
  def series(n: Int, len: Int, seed: Long = 42L, noiseAmp: Double = 0.65): Array[Array[Double]] = {
    require(n > 0 && len > 0)
    val rows = math.max(1, math.sqrt(n.toDouble).toInt)
    val out = Array.ofDim[Double](n, len)
    var i = 0
    while (i < n) {
      val lat = (i % rows).toDouble / rows          // 0..1 across grid rows
      val lon = (i / rows).toDouble / math.max(1, (n + rows - 1) / rows)
      // smooth location-dependent loadings on the shared modes
      val wSeason = 0.8 + 0.6 * math.sin(math.Pi * lat)
      val wAnnual = 0.5 + 0.5 * math.cos(2 * math.Pi * lon)
      val wEnso   = 0.4 + 0.8 * lat * lon
      val wTrend  = 0.2 + 0.4 * lat
      val phase   = 0.5 * math.Pi * lon
      var ar = 0.0
      var t = 0
      while (t < len) {
        val tt = t.toDouble
        val season = math.sin(2 * math.Pi * tt / 365.0 + phase)
        val annual = math.sin(2 * math.Pi * tt / 91.0)
        val enso   = math.sin(2 * math.Pi * tt / 1400.0 + 0.3)
        val trend  = tt / len
        // slow node-specific amplitude modulation → non-stationary windows
        val mod = 1.0 + 0.35 * math.sin(2 * math.Pi * tt / 700.0 + 2.0 * math.Pi * lat)
        ar = 0.7 * ar + noise(seed, i.toLong, t.toLong)
        out(i)(t) = mod * (wSeason * season + wAnnual * annual + wEnso * enso) +
          wTrend * trend + noiseAmp * ar
        t += 1
      }
      i += 1
    }
    out
  }

  /** NCEA-like workload (scaled by callers; defaults match the paper). */
  def ncea(n: Int = 157, len: Int = 8760, seed: Long = 42L): Array[Array[Double]] =
    series(n, len, seed)

  /** Berkeley-Earth-like workload (daily resolution, larger N). */
  def berkeley(n: Int, len: Int = 3652, seed: Long = 7L): Array[Array[Double]] =
    series(n, len, seed)

  /** Long-format DataFrame (series_id, t, value) of a generated matrix. */
  def toDF(spark: SparkSession, data: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    val n = data.length
    spark.sparkContext
      .parallelize(0 until n, math.min(n, spark.sparkContext.defaultParallelism))
      .flatMap { i => data(i).iterator.zipWithIndex.map { case (v, t) => (i, t, v) } }
      .toDF("series_id", "t", "value")
  }
}
