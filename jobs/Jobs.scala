package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.climate.ClimateData
import repro.experiments.{InMemoryFigures => IM, ScalabilityFigures => SC}
import repro.experiments.InMemoryFigures.printTable

/** Shared session builder for the spark-submit entrypoints. */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Figure 5a — network accuracy vs number of DFT coefficients. */
object Fig5aAccuracy {
  def main(args: Array[String]): Unit = {
    val data = ClimateData.ncea(n = 60, len = 3000)
    val rows = IM.fig5a(data, b = 200, theta = 0.75, coeffs = Seq(25, 50, 75, 100, 125, 150, 175, 200))
    printTable(Seq("n_coeff", "edges_exact", "edges_dft", "similarity_ratio"),
      rows.map(r => Seq[Any](r.nCoeff, r.edgesExact, r.edgesDft, r.simRatio)))
  }
}

/** Figure 5b — sketch/query time vs basic window size. */
object Fig5bBasicWindow {
  def main(args: Array[String]): Unit = {
    val data = ClimateData.ncea(n = 60, len = 3000)
    val rows = IM.fig5b(data, queryWindow = 3000, bs = Seq(25, 50, 75, 100, 150, 200, 300))
    printTable(Seq("B", "tsubasa_sketch_ms", "tsubasa_query_ms", "dft_sketch_ms", "dft_query_ms"),
      rows.map(r => Seq[Any](r.b, r.tsubasaSketchMs, r.tsubasaQueryMs, r.dftSketchMs, r.dftQueryMs)))
  }
}

/** Figure 5c — query time vs query window size. */
object Fig5cQueryWindow {
  def main(args: Array[String]): Unit = {
    val data = ClimateData.ncea(n = 60, len = 3000)
    val rows = IM.fig5c(data, b = 50, queryWindows = Seq(500, 1000, 1500, 2000, 2500, 3000))
    printTable(Seq("query_window", "tsubasa_ms", "dft_ms", "baseline_ms"),
      rows.map(r => Seq[Any](r.queryWindow, r.tsubasaMs, r.dftMs, r.baselineMs)))
  }
}

/** Figure 5d — network update time vs basic window size (real-time). */
object Fig5dUpdate {
  def main(args: Array[String]): Unit = {
    val data = ClimateData.ncea(n = 60, len = 4600)
    val rows = IM.fig5d(data, queryWindow = 3000, bs = Seq(25, 50, 100, 200, 300))
    printTable(Seq("B", "tsubasa_update_ms", "dft_update_ms"),
      rows.map(r => Seq[Any](r.b, r.tsubasaUpdateMs, r.dftUpdateMs)))
  }
}

/** Figure 6a — parallel sketch time breakdown vs N. */
object Fig6aSketchScale {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig6a")
    val rows = SC.fig6a(spark, ns = Seq(100, 200, 400, 800), len = 960, b = 120,
      coeffFraction = 0.75, storeRoot = "/tmp/tsubasa_store")
    printTable(Seq("N", "tsubasa_calc_ms", "tsubasa_write_ms", "dft_calc_ms", "dft_write_ms"),
      rows.map(r => Seq[Any](r.n, r.tsubasaCalcMs, r.tsubasaWriteMs, r.dftCalcMs, r.dftWriteMs)))
  }
}

/** Figure 6b — parallel query time breakdown vs N. */
object Fig6bQueryScale {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig6b")
    SC.fig6a(spark, ns = Seq(100, 200, 400, 800), len = 960, b = 120,
      coeffFraction = 0.75, storeRoot = "/tmp/tsubasa_store") // ensure stores exist
    val rows = SC.fig6b(spark, ns = Seq(100, 200, 400, 800), wLo = 0, wHi = 7,
      storeRoot = "/tmp/tsubasa_store")
    printTable(Seq("N", "tsubasa_read_ms", "tsubasa_calc_ms", "dft_read_ms", "dft_calc_ms"),
      rows.map(r => Seq[Any](r.n, r.tsubasaReadMs, r.tsubasaCalcMs, r.dftReadMs, r.dftCalcMs)))
  }
}

/** Figure 6c — impact of the number of partitions. */
object Fig6cPartitions {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig6c")
    val rows = SC.fig6c(spark, n = 400, len = 960, b = 120, partitions = Seq(1, 2, 4, 8, 16, 32, 63))
    printTable(Seq("partitions", "sketch_ms", "query_ms"),
      rows.map(r => Seq[Any](r.partitions, r.sketchMs, r.queryMs)))
  }
}

/** Figure 6d — sketch space overhead vs basic window size. */
object Fig6dSpace {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("fig6d")
    val rows = SC.fig6d(spark, n = 200, len = 960, bs = Seq(60, 120, 240, 480),
      storeRoot = "/tmp/tsubasa_space")
    printTable(Seq("B", "tsubasa_bytes", "dft_bytes"),
      rows.map(r => Seq[Any](r.b, r.tsubasaBytes, r.dftBytes)))
  }
}
