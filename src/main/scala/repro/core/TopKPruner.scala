package repro.core

import scala.collection.mutable
import repro.meta.{PartitionMeta, Scalar}

/** Data access the top-k pruner needs: metadata plus a row iterator.
  * Implemented by the in-memory simulator tables and (in tests) by adapters
  * over collected Spark partitions.
  */
trait PartitionData {
  def meta: PartitionMeta
  def rows: Iterator[PExprEval.RowLookup]
}

/** §5 — runtime pruning for top-k queries.
  *
  * The smallest element of the k-sized heap is the *boundary value*; before
  * scanning a micro-partition its metadata is compared against the boundary
  * and the partition is skipped when none of its rows could enter the heap.
  * Enhancements implemented here:
  *
  *  - §5.3 processing order: scan partitions in descending max order (for
  *    DESC queries) so a tight boundary forms early; a random order is the
  *    baseline the paper compares against (Figure 8).
  *  - §5.4 upfront boundary initialization from fully-matching partitions:
  *    the stricter of (a) the k-th largest partition max and (b) the
  *    largest min whose cumulative row count reaches k.
  */
object TopKPruner {

  sealed trait OrderStrategy extends Product with Serializable
  object OrderStrategy {
    /** Paper's "none/random" baseline. */
    final case class RandomOrder(seed: Long) extends OrderStrategy
    /** Paper's "full sort" — by partition max (DESC) / min (ASC). */
    case object SortByBoundaryPotential extends OrderStrategy
  }

  final case class TopKQuery(
      orderCol: String,
      k: Int,
      desc: Boolean = true,
      pred: Option[PExpr] = None,
      /** Extra row-level qualifier (e.g. join-probe membership, shape 7b). */
      rowQualifier: PExprEval.RowLookup => Boolean = _ => true,
      strategy: OrderStrategy = OrderStrategy.SortByBoundaryPotential,
      upfrontInit: Boolean = true)

  /** One qualifying row kept in the heap: its order value plus an opaque
    * reference the caller can use to materialize the full row.
    */
  final case class HeapRow(orderValue: Option[Scalar], partitionId: Int, rowIndex: Int)

  final case class TopKResult(
      rows: Seq[HeapRow],               // final top-k, best first
      partitionsTotal: Int,             // scan set entering top-k pruning
      partitionsScanned: Int,
      partitionsSkipped: Int,           // skipped via boundary comparison
      rowsScanned: Long,
      initialBoundary: Option[Scalar]) {
    def pruningRatio: Double =
      if (partitionsTotal == 0) 0.0 else partitionsSkipped.toDouble / partitionsTotal
  }

  /** Execute top-k over an already filter-pruned scan set.
    *
    * @param scanSet    partitions surviving filter pruning, with data access
    * @param filtered   the filter-pruning classification (provides the
    *                   fully-matching partitions for upfront init)
    */
  def run(scanSet: Seq[PartitionData], filtered: FilterPruneResult, q: TopKQuery): TopKResult = {
    val sign = if (q.desc) 1 else -1
    // Total order on candidate values; within a column all values share a
    // type family, so compare never returns None on real data.
    val better: (Scalar, Scalar) => Boolean = (a, b) =>
      Scalar.compare(a, b).exists(c => c * sign > 0)

    val ordered = q.strategy match {
      case OrderStrategy.RandomOrder(seed) =>
        val rnd = new scala.util.Random(seed)
        rnd.shuffle(scanSet)
      case OrderStrategy.SortByBoundaryPotential =>
        // DESC: largest max first; ASC: smallest min first. Partitions with
        // no stats (all-null order column) go last — they can only matter
        // when fewer than k non-null rows exist.
        scanSet.sortWith { (a, b) =>
          val sa = boundaryPotential(a.meta, q)
          val sb = boundaryPotential(b.meta, q)
          (sa, sb) match {
            case (Some(x), Some(y)) => better(x, y)
            case (Some(_), None)    => true
            case _                  => false
          }
        }
    }

    val initBoundary = if (q.upfrontInit) upfrontBoundary(filtered.fullyMatching, q) else None

    // Min-heap (DESC) keyed on the order value: head is the current boundary.
    implicit val heapOrd: Ordering[HeapRow] = new Ordering[HeapRow] {
      def compare(a: HeapRow, b: HeapRow): Int = {
        val c = Scalar.compare(a.orderValue.get, b.orderValue.get).getOrElse(0)
        -c * sign // PriorityQueue is a max-heap; invert so head = worst kept
      }
    }
    val heap = mutable.PriorityQueue.empty[HeapRow]
    val nullRows = mutable.ArrayBuffer.empty[HeapRow] // NULLS LAST backfill
    var boundary: Option[Scalar] = initBoundary

    var scanned = 0
    var skipped = 0
    var rowsScanned = 0L

    for (p <- ordered) {
      val canSkip = boundary.exists { b =>
        val heapFull = heap.size >= q.k
        val potential = boundaryPotential(p.meta, q)
        // With an initialized boundary, k qualifying rows at or above the
        // boundary are guaranteed to exist, so the comparison is valid even
        // before the heap fills (§5.4). Without it, only a full heap prunes.
        val active = heapFull || initBoundary.isDefined
        active && (potential match {
          case Some(best) => better(b, best) // partition's best is strictly worse
          case None       => true            // all-null order column
        })
      }
      if (canSkip) skipped += 1
      else {
        scanned += 1
        var idx = 0
        p.rows.foreach { row =>
          rowsScanned += 1
          val qualifies = q.pred.forall(PExprEval.passes(_, row)) && q.rowQualifier(row)
          if (qualifies) {
            row(q.orderCol) match {
              case Some(v) =>
                val admit = boundary match {
                  case Some(b) => !better(b, v) || heap.size < q.k && initBoundary.isEmpty
                  case None    => true
                }
                if (admit) {
                  heap.enqueue(HeapRow(Some(v), p.meta.id, idx))
                  if (heap.size > q.k) heap.dequeue()
                  if (heap.size >= q.k) {
                    val heapBoundary = heap.head.orderValue.get
                    boundary = Some(boundary match {
                      case Some(b) if better(b, heapBoundary) => b
                      case _                                  => heapBoundary
                    })
                  }
                }
              case None =>
                if (nullRows.size < q.k) nullRows += HeapRow(None, p.meta.id, idx)
            }
          }
          idx += 1
        }
      }
    }

    val sortedRows = heap.dequeueAll.reverse // best first
    val result = (sortedRows ++ nullRows).take(q.k)
    TopKResult(result, ordered.size, scanned, skipped, rowsScanned, initBoundary)
  }

  /** The best value this partition could contribute: max for DESC, min for ASC. */
  private def boundaryPotential(meta: PartitionMeta, q: TopKQuery): Option[Scalar] =
    meta.col(q.orderCol).flatMap(s => if (q.desc) s.max else s.min)

  /** §5.4 — initial boundary from the fully-matching partitions' metadata. */
  def upfrontBoundary(fullyMatching: Seq[PartitionMeta], q: TopKQuery): Option[Scalar] = {
    val full = fullyMatching.filter(_.rowCount > 0)
    if (full.isEmpty || q.k <= 0) return None
    val sign = if (q.desc) 1 else -1
    def betterOf(a: Scalar, b: Scalar): Scalar =
      if (Scalar.compare(a, b).exists(c => c * sign > 0)) a else b

    // Candidate 1: k-th best partition extreme (each partition attains its
    // max/min on at least one qualifying row).
    val extremes = full.flatMap(m => boundaryPotential(m, q))
    val cand1 = if (extremes.size >= q.k)
      Some(extremes.sortWith((a, b) => Scalar.compare(a, b).exists(c => c * sign > 0))(q.k - 1))
    else None

    // Candidate 2: sort by the opposite extreme (min for DESC), best first;
    // all rows of a partition are at or above its min, so once cumulative
    // non-null row count reaches k, that partition's min bounds the k-th row.
    val withMin = full.flatMap { m =>
      m.col(q.orderCol).flatMap { s =>
        val opposite = if (q.desc) s.min else s.max
        val nonNull = m.rowCount - s.nullCount
        opposite.filter(_ => nonNull > 0).map(v => (v, nonNull))
      }
    }.sortWith((a, b) => Scalar.compare(a._1, b._1).exists(c => c * sign > 0))
    var acc = 0L
    var cand2: Option[Scalar] = None
    val it = withMin.iterator
    while (cand2.isEmpty && it.hasNext) {
      val (v, n) = it.next(); acc += n
      if (acc >= q.k) cand2 = Some(v)
    }

    (cand1, cand2) match {
      case (Some(a), Some(b)) => Some(betterOf(a, b))
      case (a, b)             => a.orElse(b)
    }
  }
}
