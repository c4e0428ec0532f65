package repro.mpt

import java.util.concurrent.ConcurrentHashMap
import java.util.concurrent.atomic.{AtomicInteger, AtomicLong}

/** Observability for mpt scans: how many micro-partitions each pruning
  * technique removed, and what the readers actually did at runtime.
  * Keyed by table directory; `forTable` returns the most recent scan,
  * which is what tests and benches assert against.
  */
object ScanMetrics {

  final class Stats(val tableDir: String) {
    /** Partitions in the manifest. */
    @volatile var totalPartitions: Int = 0
    /** After compile-time filter pruning (§3). */
    @volatile var afterFilterPruning: Int = 0
    /** After LIMIT pruning (§4); equal to afterFilterPruning when inapplicable. */
    @volatile var afterLimitPruning: Int = 0
    /** After static top-k pruning via the upfront boundary (§5.4). */
    @volatile var afterTopKStatic: Int = 0
    /** Fully-matching partitions identified by the inverted pass (§4.2). */
    @volatile var fullyMatching: Int = 0
    @volatile var limitOutcome: String = ""
    @volatile var topKPushed: Boolean = false
    /** Partitions skipped by the runtime boundary (readers, §5.2). */
    val runtimeSkipped = new AtomicInteger(0)
    /** Partition files actually opened by readers. */
    val filesOpened = new AtomicInteger(0)
    val rowsEmitted = new AtomicLong(0L)

    def planned: Int = afterTopKStatic
    override def toString: String =
      s"Stats(total=$totalPartitions afterFilter=$afterFilterPruning " +
      s"afterLimit=$afterLimitPruning afterTopKStatic=$afterTopKStatic " +
      s"fully=$fullyMatching runtimeSkipped=${runtimeSkipped.get} " +
      s"opened=${filesOpened.get} rows=${rowsEmitted.get} limit=$limitOutcome)"
  }

  private val byScanId = new ConcurrentHashMap[Long, Stats]()
  private val lastForTable = new ConcurrentHashMap[String, java.lang.Long]()

  def register(scanId: Long, stats: Stats): Unit = {
    byScanId.put(scanId, stats)
    lastForTable.put(stats.tableDir, scanId)
  }

  def forScan(scanId: Long): Option[Stats] = Option(byScanId.get(scanId))

  /** Metrics of the most recent scan planned over `dir`. */
  def forTable(dir: String): Option[Stats] =
    Option(lastForTable.get(dir)).flatMap(id => forScan(id))
}
