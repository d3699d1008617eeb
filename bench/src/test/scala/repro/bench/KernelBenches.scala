package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness._

/** Figure 6: interactive graph query latency vs. batch size. */
class GraphQueryBench extends AnyFunSuite {
  test("fig6: graph query latencies over shared arrangements") {
    val report = GraphQueryHarness.run(
      GraphQueryHarness.Config(workers = BenchEnv.workers, nodes = 50000, edges = 320000, trials = 3))
    println(report)
    assert(report.contains("4-path"))
  }
}

/** Figure 8: interactive Datalog vs. full evaluation. */
class DatalogInteractiveBench extends AnyFunSuite {
  test("fig8: seeded queries are interactive; full evaluation is not") {
    val report = DatalogHarness.fig8(workers = BenchEnv.workers, seeds = 20)
    println(report)
    assert(report.contains("tc(x,?)"))
  }
}

/** Figure 17: Datalog full-evaluation scaling. */
class DatalogBatchBench extends AnyFunSuite {
  test("fig17: tc/sg full evaluation scales with workers") {
    val report = DatalogHarness.fig17(workerCounts = Seq(1, 4, BenchEnv.workers))
    println(report)
    assert(report.contains("tc(t)"))
  }
}

/** Figures 9 and 10: Graspan program analyses. */
class GraspanBench extends AnyFunSuite {
  test("fig9ab: dataflow analysis runtime and scaling") {
    val report = GraspanHarness.fig9Runtime(workerCounts = Seq(1, 2, 4, BenchEnv.workers))
    println(report)
    assert(report.contains("linux-lite"))
  }

  test("fig9c: interactive removal of null assignments") {
    val report = GraspanHarness.fig9Removal(workers = BenchEnv.workers, removals = 100)
    println(report)
    assert(report.contains("med"))
  }

  test("fig10: points-to, Opt vs value-alias materialization") {
    val report = GraspanHarness.fig10(workerCounts = Seq(1, 4))
    println(report)
    assert(report.contains("Opt"))
  }
}

/** Figures 11 and 14–16: batch graph computations. */
class BatchGraphBench extends AnyFunSuite {
  test("fig11/14-16: index, reach, sssp, wcc across graphs and workers") {
    val report = BatchGraphHarness.run(workerCounts = Seq(1, 4, BenchEnv.workers))
    println(report)
    assert(report.contains("twitter-lite"))
  }
}
