package repro.core

import repro.meta.PartitionMeta

/** §4 — pruning for LIMIT queries.
  *
  * If the fully-matching partitions (§4.2) together hold at least `k` rows,
  * the scan set can be shrunk to the *minimal* number of fully-matching
  * partitions whose row counts cover `k` — globally IO-optimal for the
  * supported query shapes, using only existing min/max metadata.
  *
  * Outcomes mirror the paper's Table 2 categories:
  *  - [[LimitOutcome.AlreadyMinimal]] — the post-filter scan set is already
  *    ≤ 1 partition; nothing to gain.
  *  - [[LimitOutcome.Unsupported]] — the LIMIT cannot be pushed to this scan
  *    (row-reducing operators in between) or fully-matching coverage < k.
  *  - [[LimitOutcome.Pruned]] — scan set reduced to `n` partitions (n is
  *    optimal given per-partition row counts).
  */
object LimitPruner {

  sealed trait LimitOutcome extends Product with Serializable
  object LimitOutcome {
    case object AlreadyMinimal extends LimitOutcome
    /** `shapeBlocked` distinguishes "LIMIT not pushable" from "no coverage". */
    final case class Unsupported(shapeBlocked: Boolean) extends LimitOutcome
    final case class Pruned(resultPartitions: Int) extends LimitOutcome
  }

  final case class LimitPruneResult(scanSet: Seq[PartitionMeta], outcome: LimitOutcome)

  /** @param filtered       result of filter pruning (pass 1 + 2)
    * @param k              the LIMIT (incl. OFFSET if any)
    * @param shapeSupported whether the LIMIT reaches this scan (no blocking
    *                       operators, §4.3); joins/aggregations block, the
    *                       build side of a LEFT OUTER JOIN does not.
    */
  def prune(filtered: FilterPruneResult, k: Long, shapeSupported: Boolean): LimitPruneResult = {
    val scan = filtered.scanSet
    if (scan.size <= 1)
      LimitPruneResult(scan, LimitOutcome.AlreadyMinimal)
    else if (!shapeSupported)
      LimitPruneResult(scan, LimitOutcome.Unsupported(shapeBlocked = true))
    else {
      val full = filtered.fullyMatching
      val coverage = full.map(_.rowCount).sum
      if (coverage < k)
        LimitPruneResult(scan, LimitOutcome.Unsupported(shapeBlocked = false))
      else {
        // Greedy by descending row count yields the minimal partition count.
        val chosen = scala.collection.mutable.ArrayBuffer.empty[PartitionMeta]
        var acc = 0L
        val it = full.sortBy(-_.rowCount).iterator
        while (acc < k && it.hasNext) { val p = it.next(); chosen += p; acc += p.rowCount }
        LimitPruneResult(chosen.toSeq, LimitOutcome.Pruned(chosen.size))
      }
    }
  }

  /** Table 2 bucket for an outcome. k=0 prunes to zero partitions, which the
    * paper folds into the "pruning to = 1 partition" row (mostly 1).
    */
  def bucket(outcome: LimitOutcome): String = outcome match {
    case LimitOutcome.AlreadyMinimal  => "already minimal scan set"
    case LimitOutcome.Unsupported(_)  => "unsupported shapes"
    case LimitOutcome.Pruned(n) if n <= 1 => "pruning to = 1 partition"
    case LimitOutcome.Pruned(_)       => "pruning to > 1 partitions"
  }
}
