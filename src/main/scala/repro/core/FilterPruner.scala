package repro.core

import repro.meta.PartitionMeta

/** Classification of one micro-partition against a query predicate (§4.1):
  * `NotMatching` partitions are pruned, `PartiallyMatching` stay in the scan
  * set, and `FullyMatching` partitions are guaranteed to contain only
  * qualifying rows (a subset of partially-matching).
  */
sealed trait MatchClass extends Product with Serializable
object MatchClass {
  case object NotMatching       extends MatchClass
  case object PartiallyMatching extends MatchClass
  case object FullyMatching     extends MatchClass
}

final case class ClassifiedPartition(meta: PartitionMeta, cls: MatchClass) {
  def inScanSet: Boolean     = cls != MatchClass.NotMatching
  def fullyMatching: Boolean = cls == MatchClass.FullyMatching
}

/** Result of filter pruning over a table's partitions. */
final case class FilterPruneResult(partitions: Seq[ClassifiedPartition]) {
  def total: Int = partitions.size
  def scanSet: Seq[PartitionMeta]       = partitions.filter(_.inScanSet).map(_.meta)
  def fullyMatching: Seq[PartitionMeta] = partitions.filter(_.fullyMatching).map(_.meta)
  def prunedCount: Int = partitions.count(!_.inScanSet)
  def pruningRatio: Double = if (total == 0) 0.0 else prunedCount.toDouble / total
}

/** §3 compile-time filter pruning + §4.2 fully-matching detection.
  *
  * Pass 1 evaluates the predicate against each partition's metadata and
  * removes partitions that cannot contain matching rows. Pass 2 runs the
  * *inverted* predicate over the surviving partitions: a partition that
  * cannot contain any row failing the predicate is fully-matching.
  * Partitions with zero rows are vacuously not-matching.
  */
object FilterPruner {

  def classify(parts: Seq[PartitionMeta], pred: PExpr): FilterPruneResult = {
    val inverted = Rewrites.invert(pred)
    FilterPruneResult(parts.map { meta =>
      val cls =
        if (!RangeEval.mayMatch(pred, meta)) MatchClass.NotMatching
        else if (!RangeEval.mayMatch(inverted, meta)) MatchClass.FullyMatching
        else MatchClass.PartiallyMatching
      ClassifiedPartition(meta, cls)
    })
  }

  /** A query without predicates scans everything; every non-empty partition
    * is trivially fully-matching (§4.2).
    */
  def noPredicate(parts: Seq[PartitionMeta]): FilterPruneResult =
    FilterPruneResult(parts.map { meta =>
      val cls = if (meta.rowCount == 0) MatchClass.NotMatching else MatchClass.FullyMatching
      ClassifiedPartition(meta, cls)
    })

  def classifyOpt(parts: Seq[PartitionMeta], pred: Option[PExpr]): FilterPruneResult =
    pred.map(classify(parts, _)).getOrElse(noPredicate(parts))
}
