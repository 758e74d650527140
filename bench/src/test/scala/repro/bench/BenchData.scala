package repro.bench

import repro.climate.ClimateData

/** Shared, lazily generated workloads for the bench suites (one JVM per
  * bench run, so these are built once).
  */
object BenchData {
  /** NCEA-like in-memory workload (scaled from the paper's 157×8760). */
  lazy val ncea: Array[Array[Double]] = ClimateData.ncea(n = 60, len = 4600)
}
