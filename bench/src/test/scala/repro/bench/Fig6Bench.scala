package repro.bench

import java.nio.file.Files
import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.experiments.{ScalabilityFigures => SC}
import repro.experiments.InMemoryFigures.printTable

/** Figures 6a + 6b — parallel, disk-based sketch and query time breakdown
  * vs number of time-series (Berkeley-Earth-like, B=120, query window
  * 960, 75% coefficients). One suite so the stores written for 6a are
  * reused by 6b, as in the paper's pipeline.
  *
  * Claims: TSUBASA sketch calculation beats the DFT comparator's (O(B²)
  * DFT); query time of the two is on par; both grow quadratically in N.
  */
class Fig6abScaleBench extends SparkSpec {

  // N capped at 600 so the full bench suite (with min-of-2 timing) stays
  // inside a 10-minute budget on 16 cores; the quadratic-growth and
  // winner claims are already decided by N=400→600
  private val ns = Seq(100, 200, 400, 600)
  private lazy val root = Files.createTempDirectory("tsubasa_bench_store").toString

  test("Figure 6a: sketch time breakdown table + shape") {
    val rows = SC.fig6a(spark, ns, len = 960, b = 120, coeffFraction = 0.75, storeRoot = root)
    println("\n=== Figure 6a: sketch time breakdown (B=120, L=960, parquet store) ===")
    printTable(Seq("N", "tsubasa_calc_ms", "tsubasa_write_ms", "dft_calc_ms", "dft_write_ms"),
      rows.map(r => Seq[Any](r.n, r.tsubasaCalcMs, r.tsubasaWriteMs, r.dftCalcMs, r.dftWriteMs)))

    // TSUBASA wins in aggregate and in the majority of rows; single rows on
    // a shared local[*] JVM carry seconds-scale GC noise even with min-of-2
    assert(rows.map(_.dftCalcMs).sum > rows.map(_.tsubasaCalcMs).sum,
      "TSUBASA total sketch calc must beat DFT")
    assert(rows.count(r => r.dftCalcMs > r.tsubasaCalcMs) >= (rows.size + 1) / 2,
      "TSUBASA must win the majority of rows")
    assert(rows.last.tsubasaCalcMs > rows.head.tsubasaCalcMs,
      "sketch time must grow with N")
    assert(rows.last.dftCalcMs > rows.head.dftCalcMs)
  }

  test("Figure 6b: query time breakdown table + shape") {
    val rows = SC.fig6b(spark, ns, wLo = 0, wHi = 7, storeRoot = root)
    println("\n=== Figure 6b: query time breakdown (windows 0-7, parquet store) ===")
    printTable(Seq("N", "tsubasa_read_ms", "tsubasa_calc_ms", "dft_read_ms", "dft_calc_ms"),
      rows.map(r => Seq[Any](r.n, r.tsubasaReadMs, r.tsubasaCalcMs, r.dftReadMs, r.dftCalcMs)))

    // exact and approximate query are on par
    rows.foreach(r => assert(r.tsubasaCalcMs < r.dftCalcMs * 10 && r.dftCalcMs < r.tsubasaCalcMs * 10))
    assert(rows.forall(r => r.tsubasaReadMs > 0 && r.tsubasaCalcMs > 0))
  }
}

/** Figure 6c — impact of the number of partitions at fixed N. Claim:
  * sketch and matrix-calculation time fall as partitions grow, then
  * flatten once the core count is reached (paper: 64 cores; here:
  * local[*] with ~16).
  */
class Fig6cPartitionsBench extends SparkSpec {

  test("Figure 6c: partitions table + shape") {
    val rows = SC.fig6c(spark, n = 300, len = 960, b = 120, partitions = Seq(1, 2, 4, 8, 16, 32, 63))
    println("\n=== Figure 6c: impact of partitions (N=300, B=120, L=960) ===")
    printTable(Seq("partitions", "sketch_ms", "query_ms"),
      rows.map(r => Seq[Any](r.partitions, r.sketchMs, r.queryMs)))

    val first = rows.head // 1 partition
    val atCores = rows.find(_.partitions == 16).get
    assert(first.sketchMs > atCores.sketchMs,
      s"sketching must speed up with partitions (1p=${first.sketchMs} 16p=${atCores.sketchMs})")
  }
}

/** Figure 6d — sketch store size vs basic window size (CSV store).
  * Claims: both algorithms store the same per-window statistics footprint
  * and the size shrinks as B grows (fewer windows).
  */
class Fig6dSpaceBench extends SparkSpec {

  test("Figure 6d: space overhead table + shape") {
    val root = Files.createTempDirectory("tsubasa_space_bench").toString
    val rows = SC.fig6d(spark, n = 200, len = 960, bs = Seq(60, 120, 240, 480), storeRoot = root)
    println("\n=== Figure 6d: sketch store size vs B (N=200, L=960, csv store) ===")
    printTable(Seq("B", "tsubasa_bytes", "dft_bytes"),
      rows.map(r => Seq[Any](r.b, r.tsubasaBytes, r.dftBytes)))

    rows.sliding(2).foreach { case Seq(a, b) =>
      assert(a.tsubasaBytes > b.tsubasaBytes, s"size must shrink from B=${a.b} to B=${b.b}")
      assert(a.dftBytes > b.dftBytes)
    }
    rows.foreach { r =>
      val ratio = r.dftBytes.toDouble / r.tsubasaBytes
      assert(ratio > 0.8 && ratio < 2.0, s"stores must be comparable in size (ratio $ratio at B=${r.b})")
    }
  }
}
