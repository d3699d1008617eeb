package repro.bench

import repro.SparkSpec
import repro.harness.TpchHarness

/** Benchmark scale factor: SF 0.1 (~100 MB) by default, overridable. */
object BenchEnv {
  val sf: Double      = sys.env.get("REPRO_SF").map(_.toDouble).getOrElse(0.1)
  val workers: Int    = sys.env.get("REPRO_WORKERS").map(_.toInt).getOrElse(8)
}

/** Figure 1 (tabled): TPC-H install latency, update latency, and memory
  * footprint with and without shared arrangements.
  */
class TpchSharingBench extends SparkSpec {
  test("fig1: sharing reduces install latency and memory footprint") {
    val report = TpchHarness.sharing(spark, sf = BenchEnv.sf, epochs = 4)
    println(report)
    assert(report.contains("shared") && report.contains("not shared"))
  }
}

/** Figure 12: streaming update rates for the 22 queries. */
class TpchStreamingBench extends SparkSpec {
  test("fig12: streaming update rates per query") {
    val report = TpchHarness.streamingRates(spark, sf = BenchEnv.sf, batchRows = 100000)
    println(report)
    assert(report.contains("q01") && report.contains("q22"))
  }
}

/** Figure 13: batch elapsed times per query on Spark SQL and DuckDB. */
class TpchBatchBench extends SparkSpec {
  test("fig13: batch elapsed times per query") {
    val report = TpchHarness.batchElapsed(spark, sf = BenchEnv.sf)
    println(report)
    assert(report.contains("q01") && report.contains("q22"))
  }
}
