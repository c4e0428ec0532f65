package repro.bench

import repro.SparkSpec
import repro.tpch.TpchPruning
import repro.workload.WorkloadStats

/** §8.3 / Figure 13 — TPC-H pruning vs the production-like workload.
  *
  * The paper's headline contrast: TPC-H SF100 clustered on the date columns
  * prunes 28.7 % on average (median 8.3 %), while real workloads prune
  * 99.4 % of partitions. The bench reproduces both sides of the contrast.
  */
class TpchPruningBench extends SparkSpec {

  test("TPC-H-lite clustered pruning ratios vs workload pruning") {
    val tables = TpchPruning.buildTables(spark, sf = 0.1)
    val result = TpchPruning.run(tables)
    println(TpchPruning.report(result))

    // Paper: average 28.7 %, median 8.3 % — same order, median < average.
    assert(result.average > 0.10 && result.average < 0.50,
      f"TPC-H average ${result.average}%.3f outside the plausible band")
    assert(result.medianPerQuery < result.average,
      "per-query median must sit below the average (most queries barely prune)")

    // The §8.3 contrast: the production-like workload prunes a far larger
    // fraction of partitions than TPC-H.
    val workload = WorkloadBenchRun.run
    val workloadOverall = WorkloadStats.overallPartitionRatio(workload.reports)
    println(f"contrast: workload overall ${workloadOverall * 100}%.1f %% vs TPC-H ${result.average * 100}%.1f %%")
    assert(workloadOverall > result.average + 0.2,
      "real-workload pruning must dominate TPC-H pruning by a wide margin")
  }

  test("no TPC-H query benefits from top-k or LIMIT pruning (determinism, §8.3)") {
    // The paper notes TPC-H has no top-k pruning opportunities and its
    // determinism rules out LIMIT pruning; our lite predicate set mirrors
    // that — no query carries ORDER BY+LIMIT or bare LIMIT shapes.
    repro.tpch.TpchQueries.queries.foreach { q =>
      assert(q.scans.nonEmpty)
    }
  }
}
