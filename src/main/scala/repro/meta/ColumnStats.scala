package repro.meta

/** Zone-map / SMA record for one column of one micro-partition:
  * min, max over non-null values, plus the null count.
  *
  * `min`/`max` are None iff every value is null (or the partition is empty).
  * The null count is what enables `IS NULL` pruning and is a prerequisite
  * for declaring a comparison predicate *all-true* on a partition (§4.2):
  * a partition with nulls can never be fully-matching for `x > 5`.
  */
final case class ColumnStats(min: Option[Scalar], max: Option[Scalar], nullCount: Long) {
  def range: Option[ValueRange] = for { lo <- min; hi <- max } yield ValueRange(lo, hi)
  def hasNulls: Boolean = nullCount > 0
  def allNull(rowCount: Long): Boolean = nullCount == rowCount
}

object ColumnStats {
  val allNulls: ColumnStats = ColumnStats(None, None, 0L)

  /** Fold a stream of raw values into stats. Values must share a type family. */
  def ofValues(values: Iterable[Any]): ColumnStats = {
    var nulls = 0L
    var lo: Option[Scalar] = None
    var hi: Option[Scalar] = None
    values.foreach { v =>
      Scalar.fromAny(v) match {
        case None => nulls += 1
        case Some(s) =>
          lo = lo.flatMap(Scalar.min(_, s)).orElse(Some(s))
          hi = hi.flatMap(Scalar.max(_, s)).orElse(Some(s))
      }
    }
    ColumnStats(lo, hi, nulls)
  }
}

/** Per-partition metadata: identifier, row count and per-column stats.
  * This is the record the paper's metadata service serves to the pruner.
  */
final case class PartitionMeta(id: Int, rowCount: Long, cols: Map[String, ColumnStats]) {
  def col(name: String): Option[ColumnStats] = cols.get(name)
}
