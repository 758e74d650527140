package repro.experiments

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.climate.ClimateData
import repro.spark.{Sketcher, SketchStore, SparkExact}

/** Harnesses for the paper's parallel + disk-based experiments
  * (Figures 6a–6d) on the Berkeley-Earth-like data set. The paper's
  * worker pool + PostgreSQL becomes Spark local[*] tasks + a Parquet/CSV
  * sketch store (DESIGN.md §4); "sketch calculation" vs "write" and
  * "read" vs "matrix calculation" keep the paper's breakdown.
  */
object ScalabilityFigures {

  /** Materialize a DataFrame without collecting rows to the driver. */
  private def force(df: DataFrame): Long = df.count()

  // ---------------------------------------------------------------- Fig 6a

  final case class SketchScaleRow(n: Int, tsubasaCalcMs: Double, tsubasaWriteMs: Double,
                                  dftCalcMs: Double, dftWriteMs: Double)

  /** Figure 6a — sketch time breakdown (calculation vs database write) vs
    * number of time-series, for TSUBASA and the DFT comparator.
    */
  /** Untimed warm-up: exercise the full sketch pipeline once so the first
    * timed row does not absorb Spark session/codegen warm-up.
    */
  def warmUp(spark: SparkSession, b: Int): Unit = {
    val raw = ClimateData.toDF(spark, ClimateData.berkeley(20, 4 * b))
    force(Sketcher.pairSketch(Sketcher.withDft(Sketcher.seriesWindowStats(raw, b)), b / 2))
    force(Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b)))
  }

  def fig6a(spark: SparkSession, ns: Seq[Int], len: Int, b: Int, coeffFraction: Double,
            storeRoot: String): Seq[SketchScaleRow] = {
    warmUp(spark, b)
    ns.map { n =>
      val raw = ClimateData.toDF(spark, ClimateData.berkeley(n, len)).cache()
      force(raw)
      val nc = math.max(1, (coeffFraction * b).toInt)

      // min of two runs: a single stray GC pause on a multi-second Spark job
      // would otherwise dwarf the algorithmic difference under test
      def minOf2(mk: => DataFrame): (DataFrame, Double) = {
        val (s1, t1) = Timing.time { val s = mk.cache(); force(s); s }
        s1.unpersist(blocking = true)
        val (s2, t2) = Timing.time { val s = mk.cache(); force(s); s }
        (s2, math.min(t1, t2))
      }
      val (tsSketch, tsCalc) =
        minOf2(Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b)))
      val tsStore = SketchStore(s"$storeRoot/tsubasa_$n")
      val tsWrite = Timing.timeMs(tsStore.writePair(tsSketch))
      tsSketch.unpersist()

      val (dftSketch, dftCalc) =
        minOf2(Sketcher.pairSketch(Sketcher.withDft(Sketcher.seriesWindowStats(raw, b)), nc))
      val dftStore = SketchStore(s"$storeRoot/dft_$n")
      val dftWrite = Timing.timeMs(dftStore.writePair(dftSketch))
      dftSketch.unpersist()
      raw.unpersist()
      SketchScaleRow(n, tsCalc, tsWrite, dftCalc, dftWrite)
    }
  }

  // ---------------------------------------------------------------- Fig 6b

  final case class QueryScaleRow(n: Int, tsubasaReadMs: Double, tsubasaCalcMs: Double,
                                 dftReadMs: Double, dftCalcMs: Double)

  /** Figure 6b — query time breakdown (database read vs matrix
    * calculation) vs number of time-series. Requires the stores written
    * by fig6a (same roots).
    */
  def fig6b(spark: SparkSession, ns: Seq[Int], wLo: Long, wHi: Long,
            storeRoot: String): Seq[QueryScaleRow] =
    ns.map { n =>
      val tsStore = SketchStore(s"$storeRoot/tsubasa_$n")
      val (tsSketch, tsRead) = Timing.time {
        val df = tsStore.readPair(spark).cache(); force(df); df
      }
      val tsCalc = Timing.timeMs(force(SparkExact.correlationMatrix(tsSketch, wLo, wHi)))
      tsSketch.unpersist()

      val dftStore = SketchStore(s"$storeRoot/dft_$n")
      val (dftSketch, dftRead) = Timing.time {
        val df = dftStore.readPair(spark).cache(); force(df); df
      }
      val dftCalc = Timing.timeMs(force(SparkExact.approxCorrelationMatrix(dftSketch, wLo, wHi)))
      dftSketch.unpersist()
      QueryScaleRow(n, tsRead, tsCalc, dftRead, dftCalc)
    }

  // ---------------------------------------------------------------- Fig 6c

  final case class PartitionRow(partitions: Int, sketchMs: Double, queryMs: Double)

  /** Figure 6c — impact of the number of partitions on sketch and query
    * (matrix-calculation) time at fixed N. The paper varies worker count
    * on 64 cores; we vary the partition count of the pair table on
    * local[*] — times fall until partitions reach the core count, then
    * flatten (substitution documented in DESIGN.md §4).
    */
  def fig6c(spark: SparkSession, n: Int, len: Int, b: Int,
            partitions: Seq[Int]): Seq[PartitionRow] = {
    val raw = ClimateData.toDF(spark, ClimateData.berkeley(n, len)).cache()
    force(raw)
    val nWin = len / b
    val rows = partitions.map { p =>
      val prev = spark.conf.get("spark.sql.shuffle.partitions")
      spark.conf.set("spark.sql.shuffle.partitions", p.toString)
      try {
        var sketch: DataFrame = null
        val sketchMs = Timing.timeMs {
          sketch = Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b))
            .repartition(p).cache()
          force(sketch)
        }
        val queryMs = Timing.timeMs(force(SparkExact.correlationMatrix(sketch, 0, nWin - 1)))
        sketch.unpersist()
        PartitionRow(p, sketchMs, queryMs)
      } finally spark.conf.set("spark.sql.shuffle.partitions", prev)
    }
    raw.unpersist()
    rows
  }

  // ---------------------------------------------------------------- Fig 6d

  final case class SpaceRow(b: Int, tsubasaBytes: Long, dftBytes: Long)

  /** Figure 6d — on-disk sketch size vs basic window size, for both
    * algorithms, in the uncompressed CSV store (Parquet compression would
    * mask the L/B row-count dependence the paper plots).
    */
  def fig6d(spark: SparkSession, n: Int, len: Int, bs: Seq[Int],
            storeRoot: String): Seq[SpaceRow] = {
    val raw = ClimateData.toDF(spark, ClimateData.berkeley(n, len)).cache()
    force(raw)
    val rows = bs.map { b =>
      val ts = SketchStore(s"$storeRoot/space_ts_$b", format = "csv")
      ts.writePair(Sketcher.pairSketch(Sketcher.seriesWindowStats(raw, b)))
      // the DFT store persists the same per-window stats plus d_sq
      val nc = math.max(1, (0.75 * b).toInt)
      val dft = SketchStore(s"$storeRoot/space_dft_$b", format = "csv")
      dft.writePair(Sketcher.pairSketch(Sketcher.withDft(Sketcher.seriesWindowStats(raw, b)), nc))
      SpaceRow(b, ts.sizeBytes, dft.sizeBytes)
    }
    raw.unpersist()
    rows
  }
}
