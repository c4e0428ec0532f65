package repro.workload

import repro.core.LimitPruner
import repro.sim.SimExecutor.QueryReport

/** Distribution + aggregate statistics over per-query pruning reports —
  * the quantities the paper's evaluation figures/tables report.
  */
object WorkloadStats {

  final case class Dist(values: IndexedSeq[Double]) {
    def n: Int = values.size
    def mean: Double = if (values.isEmpty) 0.0 else values.sum / values.size
    def percentile(q: Double): Double =
      if (values.isEmpty) 0.0
      else {
        val sorted = values.sorted
        sorted(math.min(sorted.size - 1, math.max(0, (q * (sorted.size - 1)).round.toInt)))
      }
    def median: Double = percentile(0.5)
    /** Fraction of values at or above x. */
    def fracAtLeast(x: Double): Double =
      if (values.isEmpty) 0.0 else values.count(_ >= x).toDouble / values.size
    def fracEqual(x: Double): Double =
      if (values.isEmpty) 0.0 else values.count(v => math.abs(v - x) < 1e-12).toDouble / values.size
  }

  /** Figure 4: filter-pruning ratio per query *relative to the query's total
    * partitions* (including scans without filters), over queries with ≥1
    * predicate.
    */
  def filterRatios(reports: Seq[QueryReport]): Dist = Dist(
    reports.iterator.filter(r => r.filter.isDefined || r.buildFilter.isDefined)
      .map { r =>
        val filterPruned = r.filter.map(_.pruned).getOrElse(0) +
          r.buildFilter.map(_.pruned).getOrElse(0)
        if (r.partitionsEligible == 0) 0.0
        else filterPruned.toDouble / r.partitionsEligible
      }.toIndexedSeq)

  /** Figure 10: probe-side scan-set reduction for queries where join pruning
    * was attempted (non-degenerate probe scan).
    */
  def joinRatios(reports: Seq[QueryReport]): Dist = Dist(
    reports.iterator.flatMap(_.join).filter(s => s.before > 0 && s.prunedAny)
      .map(_.ratio).toIndexedSeq)

  /** Top-k pruning ratio on the scans where it was *successfully* applied —
    * Figure 9 conditions on scans that actually pruned.
    */
  def topkRatios(reports: Seq[QueryReport]): Dist = Dist(
    reports.iterator.flatMap(_.topk).filter(s => s.before > 1 && s.prunedAny)
      .map(_.ratio).toIndexedSeq)

  /** LIMIT pruning ratio for queries where it pruned (Figure 1's LIMIT row). */
  def limitRatios(reports: Seq[QueryReport]): Dist = Dist(
    reports.iterator.flatMap(_.limit).collect {
      case (LimitPruner.LimitOutcome.Pruned(_), stat) if stat.before > 0 => stat.ratio
    }.toIndexedSeq)

  /** Partition-weighted filter-pruning ratio: of all partitions touched by
    * queries with predicates, the fraction filter pruning removed. This is
    * the form in which "99 % for filter pruning" is achievable platform-wide
    * while per-query distributions still contain zeros (Fig. 1 vs Fig. 4).
    */
  def filterPartitionWeighted(reports: Seq[QueryReport]): Double = {
    val rs = reports.filter(r => r.filter.isDefined || r.buildFilter.isDefined)
    val eligible = rs.iterator.map(_.partitionsEligible.toLong).sum
    val pruned = rs.iterator.map(r =>
      r.filter.map(_.pruned).getOrElse(0).toLong + r.buildFilter.map(_.pruned).getOrElse(0).toLong).sum
    if (eligible == 0) 0.0 else pruned.toDouble / eligible
  }

  /** The platform-wide metric: fraction of all partitions (that eligible
    * queries would otherwise touch) removed by pruning — the 99.4 % analog.
    */
  def overallPartitionRatio(reports: Seq[QueryReport]): Double = {
    val eligible = reports.iterator.map(_.partitionsEligible.toLong).sum
    val scanned = reports.iterator.map(_.partitionsScanned.toLong).sum
    if (eligible == 0) 0.0 else (eligible - scanned).toDouble / eligible
  }

  /** Table 2: outcome breakdown of LIMIT pruning, split by predicate. */
  final case class Table2(noPred: Map[String, Double], pred: Map[String, Double],
                          overall: Map[String, Double])

  def table2(reports: Seq[QueryReport]): Table2 = {
    val limits = reports.filter(r => r.spec.isLimitOnly && r.limit.isDefined)
    def breakdown(rs: Seq[QueryReport]): Map[String, Double] = {
      val n = rs.size.toDouble.max(1.0)
      rs.groupBy(r => LimitPruner.bucket(r.limit.get._1))
        .view.mapValues(_.size / n).toMap
    }
    Table2(
      breakdown(limits.filterNot(_.spec.hasPredicate)),
      breakdown(limits.filter(_.spec.hasPredicate)),
      breakdown(limits))
  }

  /** Figure 11: share of queries per combination of effective techniques. */
  def flowCombinations(reports: Seq[QueryReport]): Map[String, Double] = {
    val n = reports.size.toDouble.max(1.0)
    reports.groupBy { r =>
      val fs = Seq(
        if (r.filter.exists(_.prunedAny) || r.buildFilter.exists(_.prunedAny)) Some("filter") else None,
        if (r.join.exists(_.prunedAny)) Some("join") else None,
        if (r.limit.exists { case (o, _) => o.isInstanceOf[LimitPruner.LimitOutcome.Pruned] })
          Some("limit") else None,
        if (r.topk.exists(_.prunedAny)) Some("topk") else None).flatten
      if (fs.isEmpty) "none" else fs.mkString("+")
    }.view.mapValues(_.size / n).toMap
  }
}
