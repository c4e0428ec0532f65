package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.workload.{Experiments, WorkloadStats}

/** Shared workload run for the bench suites (one generation, many reports).
  * Scale: 60 tables / 20 000 queries — large enough for stable percentages,
  * small enough to run in seconds.
  */
object WorkloadBenchRun {
  lazy val run: Experiments.WorkloadRun = Experiments.runWorkload(
    nTables = 60, nQueries = 20000, seed = 42)
}

/** Table 1 — relative frequency of LIMIT-query types. */
class Table1QueryMixBench extends AnyFunSuite {
  test("Table 1: query-type mix (paper vs measured)") {
    val run = WorkloadBenchRun.run
    val report = Experiments.table1Report(run)
    println(report)
    val t1 = repro.workload.QueryClassifier.table1(run.queries.map(_.sql))
    // Shape assertions: each measured frequency within ±40 % of the paper's.
    assert(math.abs(t1.limitQueries - 0.0260) < 0.010)
    assert(math.abs(t1.limitNoPred - 0.0037) < 0.002)
    assert(math.abs(t1.limitPred - 0.0223) < 0.009)
    assert(math.abs(t1.topK - 0.0555) < 0.015)
    assert(math.abs(t1.topKOrderBy - 0.0447) < 0.013)
    assert(math.abs(t1.topKGroupAgg - 0.0096) < 0.005)
    assert(t1.topKGroupKey < t1.topKGroupAgg, "rarest subtype stays rarest")
  }
}

/** Table 2 — LIMIT pruning applicability breakdown. */
class Table2LimitPruningBench extends AnyFunSuite {
  test("Table 2: LIMIT pruning outcome breakdown (paper vs measured)") {
    val run = WorkloadBenchRun.run
    println(Experiments.table2Report(run))
    val t2 = WorkloadStats.table2(run.reports)
    // Shape claims from the paper:
    // (1) "already minimal" dominates every column;
    assert(t2.overall("already minimal scan set") > 0.5)
    assert(t2.noPred("already minimal scan set") > t2.pred.getOrElse("already minimal scan set", 0.0) - 0.25)
    // (2) with-predicate queries are mostly minimal-or-unsupported;
    assert(t2.pred.getOrElse("unsupported shapes", 0.0) >
           t2.noPred.getOrElse("unsupported shapes", 0.0),
      "unsupported shapes concentrate on predicated queries")
    // (3) when pruning applies it mostly reaches a single partition;
    assert(t2.overall.getOrElse("pruning to = 1 partition", 0.0) >=
           t2.overall.getOrElse("pruning to > 1 partitions", 0.0))
    // (4) without predicates, pruning applies much more often.
    assert(t2.noPred.getOrElse("pruning to = 1 partition", 0.0) >
           t2.pred.getOrElse("pruning to = 1 partition", 0.0))
  }
}

/** Conclusion / Figure 1 / Figure 4 headline ratios. */
class HeadlineRatiosBench extends AnyFunSuite {
  test("headline pruning ratios (paper vs measured)") {
    val run = WorkloadBenchRun.run
    println(Experiments.headlineReport(run))
    val filter = WorkloadStats.filterRatios(run.reports)
    val join = WorkloadStats.joinRatios(run.reports)
    val topk = WorkloadStats.topkRatios(run.reports)
    val overall = WorkloadStats.overallPartitionRatio(run.reports)
    // Figure 4 shape: a large ≥90 % bucket and a visible zero bucket.
    assert(filter.fracAtLeast(0.9) > 0.25 && filter.fracAtLeast(0.9) < 0.65)
    assert(filter.fracEqual(0.0) > 0.10 && filter.fracEqual(0.0) < 0.40)
    // Join pruning: strong median (paper ≥ 0.72), bounded 100 % bucket.
    assert(join.median > 0.6)
    assert(join.fracEqual(1.0) > 0.05 && join.fracEqual(1.0) < 0.35)
    // Top-k average ratio in the paper's neighbourhood (0.77).
    assert(topk.mean > 0.6)
    // Platform-wide partition reduction is the dominant effect.
    assert(overall > 0.7, f"overall $overall%.3f")
  }
}

/** Figure 11 — pruning-flow combinations. */
class PruningFlowBench extends AnyFunSuite {
  test("pruning flow: filter dominates; combinations appear in order") {
    val run = WorkloadBenchRun.run
    println(Experiments.flowReport(run))
    val combos = WorkloadStats.flowCombinations(run.reports)
    val filterShare = combos.collect { case (k, v) if k.contains("filter") => v }.sum
    val joinShare = combos.collect { case (k, v) if k.contains("join") => v }.sum
    val topkShare = combos.collect { case (k, v) if k.contains("topk") => v }.sum
    val limitShare = combos.collect { case (k, v) if k.contains("limit") => v }.sum
    assert(filterShare > joinShare, "filter pruning is the most common technique")
    assert(joinShare > topkShare)
    assert(topkShare > limitShare, "LIMIT pruning applies to the fewest queries")
  }
}

/** Figure 10 — join pruning impact. */
class JoinPruningBench extends AnyFunSuite {
  test("join pruning: probe-side scan-set reduction distribution") {
    val run = WorkloadBenchRun.run
    val join = WorkloadStats.joinRatios(run.reports)
    println("Figure 10 — probe-side scan-set reduction by join pruning")
    println(f"  mean:   0.79 (paper) → ${join.mean}%.3f")
    println(f"  median: >= 0.72 (paper) → ${join.median}%.3f")
    println(f"  100%% bucket: ~13%% (paper) → ${join.fracEqual(1.0) * 100}%.1f %%")
    for (q <- Seq(0.1, 0.25, 0.5, 0.75, 0.9))
      println(f"  p${(q * 100).toInt}%-3d ${join.percentile(q)}%.3f")
    assert(join.mean > 0.55 && join.mean < 0.95)
    assert(join.median > 0.6)
    assert(join.fracEqual(1.0) > 0.05 && join.fracEqual(1.0) < 0.35)
  }
}
