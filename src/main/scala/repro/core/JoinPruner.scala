package repro.core

import repro.meta.{ColumnStats, PartitionMeta, Scalar, ValueRange}

/** §6 — partition pruning for JOIN queries (coarse-grained sideways
  * information passing).
  *
  * During the hash join's build phase the build-side join-key values are
  * summarized into a compact structure; the summary is "shipped" to the
  * probe side and overlapped with each probe micro-partition's min/max
  * metadata. Partitions that cannot contain joinable tuples are pruned
  * before they are loaded.
  *
  * The summary trades accuracy for size (it must cross the network in a
  * real deployment): we implement the spectrum the paper sketches, from a
  * single global min/max range up to an exact sorted set, with the bounded
  * *range set* in between — a fixed number of intervals obtained by cutting
  * the sorted distinct values at the largest gaps. All variants are
  * conservative: they may fail to prune a prunable partition, never the
  * converse.
  */
object JoinPruner {

  sealed trait BuildSummary extends Product with Serializable {
    /** May the build side contain a value inside `range`? */
    def mayOverlap(range: ValueRange): Boolean
    /** Approximate serialized size, to reason about the accuracy/size trade-off. */
    def sizeBytes: Long
  }

  /** Empty build side: nothing can join; every probe partition is pruned. */
  case object EmptySummary extends BuildSummary {
    def mayOverlap(range: ValueRange): Boolean = false
    def sizeBytes: Long = 0L
  }

  final case class MinMaxSummary(range: ValueRange) extends BuildSummary {
    def mayOverlap(r: ValueRange): Boolean = range.overlaps(r)
    def sizeBytes: Long = 16L
  }

  final case class RangeSetSummary(ranges: Vector[ValueRange]) extends BuildSummary {
    def mayOverlap(r: ValueRange): Boolean = ranges.exists(_.overlaps(r))
    def sizeBytes: Long = 16L * ranges.size
  }

  final case class ExactSetSummary(sorted: Vector[Scalar]) extends BuildSummary {
    def mayOverlap(r: ValueRange): Boolean = {
      // Binary search for the first element >= r.min, then check <= r.max.
      var lo = 0; var hi = sorted.size
      while (lo < hi) {
        val mid = (lo + hi) >>> 1
        if (Scalar.lt(sorted(mid), r.min).contains(true)) lo = mid + 1 else hi = mid
      }
      lo < sorted.size && Scalar.lte(sorted(lo), r.max).contains(true)
    }
    def sizeBytes: Long = 8L * sorted.size
  }

  /** Build a summary from the build side's join-key values.
    *
    * @param maxRanges summary budget: number of intervals kept. Values
    *                  beyond the budget are merged across the smallest gaps,
    *                  so the summary loses precision exactly where it costs
    *                  least. `Int.MaxValue` yields an exact set.
    */
  def summarize(values: IterableOnce[Scalar], maxRanges: Int = 64): BuildSummary = {
    val distinct = values.iterator.toVector.distinct
    if (distinct.isEmpty) EmptySummary
    else {
      val sorted = distinct.sortWith((a, b) => Scalar.lt(a, b).contains(true))
      if (maxRanges == Int.MaxValue) ExactSetSummary(sorted)
      else if (maxRanges <= 1) MinMaxSummary(ValueRange(sorted.head, sorted.last))
      else if (sorted.size <= maxRanges) ExactSetSummary(sorted)
      else {
        // Keep the (maxRanges - 1) largest gaps as cuts between intervals.
        val gaps = (1 until sorted.size).map { i =>
          val w = for {
            a <- Scalar.asDouble(sorted(i - 1)); b <- Scalar.asDouble(sorted(i))
          } yield b - a
          (i, w.getOrElse(0.0))
        }
        val cuts = gaps.sortBy(-_._2).take(maxRanges - 1).map(_._1).sorted
        val bounds = (0 +: cuts) :+ sorted.size
        val ranges = bounds.sliding(2).collect {
          case Seq(s, e) if s < e => ValueRange(sorted(s), sorted(e - 1))
        }.toVector
        RangeSetSummary(ranges)
      }
    }
  }

  final case class JoinPruneResult(
      scanSet: Seq[PartitionMeta],
      prunedCount: Int,
      total: Int,
      summary: BuildSummary) {
    def pruningRatio: Double = if (total == 0) 0.0 else prunedCount.toDouble / total
  }

  /** Prune probe-side partitions whose join-key min/max overlaps nothing in
    * the build summary. Partitions with unknown stats are kept (no false
    * negatives); all-null key partitions are pruned — NULL never joins.
    */
  def pruneProbe(probeParts: Seq[PartitionMeta], joinCol: String,
                 summary: BuildSummary): JoinPruneResult = {
    val (kept, pruned) = probeParts.partition { m =>
      m.col(joinCol) match {
        case Some(ColumnStats(Some(mn), Some(mx), _)) => summary.mayOverlap(ValueRange(mn, mx))
        case Some(ColumnStats(None, None, _))         => false // all NULL keys
        case _                                        => true  // missing stats: keep
      }
    }
    JoinPruneResult(kept, pruned.size, probeParts.size, summary)
  }
}
