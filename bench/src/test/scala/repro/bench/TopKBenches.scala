package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.workload.Experiments

/** Figure 8 — influence of partition processing order on top-k pruning. */
class TopKSortingBench extends AnyFunSuite {
  test("top-k processing-order strategies: full sort beats random order") {
    val results = Experiments.runTopKSorting(nQueriesPerCell = 150, seed = 7)
    println(Experiments.sortingReport(results))
    for (layout <- Seq("sorted", "clustered", "random")) {
      val random = results.find(r => r.layout == layout && r.strategy == "none/random").get
      val sorted = results.find(r => r.layout == layout && r.strategy == "full sort").get
      // Paper's Figure 8 claims: better mean AND better tails.
      assert(sorted.ratios.mean >= random.ratios.mean - 1e-9,
        s"$layout: full sort mean ${sorted.ratios.mean} < random ${random.ratios.mean}")
      assert(sorted.ratios.percentile(0.1) >= random.ratios.percentile(0.1) - 1e-9,
        s"$layout: full sort tail regressed")
    }
    // On non-random layouts the improvement must be substantial.
    val clusteredGain =
      results.find(r => r.layout == "clustered" && r.strategy == "full sort").get.ratios.mean -
      results.find(r => r.layout == "clustered" && r.strategy == "none/random").get.ratios.mean
    assert(clusteredGain > 0.05, f"expected a visible gain, got $clusteredGain%.3f")
  }
}

/** Figure 9 — top-k pruning ratio vs runtime(-proxy) improvement. */
class TopKImpactBench extends AnyFunSuite {
  test("top-k pruning ratio correlates with scan-work improvement across buckets") {
    val impacts = Experiments.runTopKImpact(nQueries = 400, seed = 13)
    println(Experiments.topkImpactReport(impacts))
    impacts.foreach { b =>
      // The paper's claim: the two CDFs track each other closely.
      assert(math.abs(b.pruning.mean - b.improvement.mean) < 0.25,
        s"${b.bucket}: pruning ${b.pruning.mean} vs improvement ${b.improvement.mean}")
      assert(b.pruning.mean > 0.4, s"${b.bucket}: top-k pruning ineffective")
    }
    val all = impacts.flatMap(_.pruning.values)
    val mean = all.sum / all.size
    println(f"overall top-k pruning mean: 0.77 (paper) → $mean%.3f")
    assert(mean > 0.55, f"overall mean $mean%.3f")
  }
}
