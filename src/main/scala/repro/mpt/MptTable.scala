package repro.mpt

import java.util.{Map => JMap}

import scala.collection.mutable
import scala.jdk.CollectionConverters._

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.GenericInternalRow
import org.apache.spark.sql.connector.catalog.{SupportsRead, Table, TableCapability, TableProvider}
import org.apache.spark.sql.connector.expressions.{NamedReference, NullOrdering, SortDirection, SortOrder, Transform}
import org.apache.spark.sql.connector.read._
import org.apache.spark.sql.sources.Filter
import org.apache.spark.sql.types.StructType
import org.apache.spark.sql.util.CaseInsensitiveStringMap

import repro.core._
import repro.meta.{PartitionMeta, Scalar}

/** DataSource V2 provider for mpt (micro-partitioned) tables.
  *
  * This is where the paper's pruning techniques meet Catalyst:
  *
  *  - `SupportsPushDownFilters` → compile-time filter pruning (§3) over the
  *    manifest's zone maps, plus the inverted second pass marking
  *    fully-matching partitions (§4.2). Filters we can evaluate exactly are
  *    accepted and applied in the reader; the rest stay residual (Spark
  *    re-applies them), so pruning can use them but correctness never
  *    depends on our row-level evaluation.
  *  - `SupportsPushDownLimit` → LIMIT pruning (§4): scan set reduced to the
  *    minimal fully-matching cover of k. Spark keeps the Limit operator
  *    (partial push), so any superset of k qualifying rows is a valid scan
  *    output.
  *  - `SupportsPushDownTopN` → top-k pruning (§5): partitions reordered by
  *    boundary potential (§5.3), statically pruned with the upfront
  *    boundary (§5.4), and skipped at *runtime* via the shared
  *    [[BoundaryRegistry]] as scan tasks tighten the boundary (§5.2).
  *
  * Usage: `spark.read.format("repro.mpt.MptTableProvider").load(dir)`.
  */
class MptTableProvider extends TableProvider {
  override def supportsExternalMetadata(): Boolean = false

  private def dirOf(options: CaseInsensitiveStringMap): String = {
    val p = options.get("path")
    require(p != null, "mpt: missing 'path' option")
    p
  }

  override def inferSchema(options: CaseInsensitiveStringMap): StructType =
    MptManifest.read(dirOf(options)).schema

  override def getTable(schema: StructType, partitioning: Array[Transform],
                        properties: JMap[String, String]): Table = {
    val dir = dirOf(new CaseInsensitiveStringMap(properties))
    new MptTable(dir, MptManifest.read(dir))
  }
}

final class MptTable(dir: String, manifest: MptManifest) extends Table with SupportsRead {
  override def name(): String = s"mpt:$dir"
  override def schema(): StructType = manifest.schema
  override def capabilities(): java.util.Set[TableCapability] =
    Set(TableCapability.BATCH_READ).asJava
  override def newScanBuilder(options: CaseInsensitiveStringMap): ScanBuilder =
    new MptScanBuilder(dir, manifest)
}

/** Serializable plan-time description of a pushed TopN. */
final case class TopKPlan(orderCol: String, desc: Boolean, k: Int)

final class MptScanBuilder(dir: String, manifest: MptManifest)
    extends ScanBuilder
    with SupportsPushDownFilters
    with SupportsPushDownRequiredColumns
    with SupportsPushDownLimit
    with SupportsPushDownTopN {

  private val metaById: Map[Int, PartitionMeta] =
    manifest.metas.map(m => m.id -> m).toMap

  // Scan-set state, refined by each pushdown in Catalyst's order:
  // filters → limit / topN → column pruning.
  private var scanEntries: Vector[MptPartitionEntry] =
    manifest.partitions.filter(_.rowCount > 0)
  private var fullyIds: Set[Int] = scanEntries.map(_.id).toSet // no-pred: all fully (§4.2)
  private var acceptedFilters: Array[Filter] = Array.empty
  private var rowFilter: Option[PExpr] = None
  private var readSchema: StructType = manifest.schema
  private var topK: Option[TopKPlan] = None
  private var limitOutcomeStr: String = ""
  private var afterFilterCount: Int = scanEntries.size
  private var afterLimitCount: Int = scanEntries.size

  override def pushFilters(filters: Array[Filter]): Array[Filter] = {
    val (ok, residual) = filters.partition(f => FilterTranslator.translate(f).isDefined)
    acceptedFilters = ok
    val pexprs = ok.toSeq.flatMap(FilterTranslator.translate)
    rowFilter = if (pexprs.nonEmpty) Some(PExpr.and(pexprs)) else None
    rowFilter.foreach { pred =>
      // Pass 1 runs through the adaptive pruning tree (§3.2): filter leaves
      // are reordered by measured pruning ratio / cost as the manifest is
      // streamed, and leaves below an AND that stop paying for themselves
      // are cut off. Cutoff only ever weakens pruning (conservative).
      val pruner = new AdaptivePruner(PruningTree.fromPExpr(pred))
      val kept = pruner.run(scanEntries.map(e => metaById(e.id))).map(_.id).toSet
      // Pass 2 (§4.2): inverted predicate over the survivors.
      val classified = FilterPruner.classify(
        scanEntries.filter(e => kept.contains(e.id)).map(e => metaById(e.id)), pred)
      val keep = classified.scanSet.map(_.id).toSet
      scanEntries = scanEntries.filter(e => keep.contains(e.id))
      // Residual filters Spark re-applies could reject rows of a partition we
      // deem fully matching, so §4.2 certification requires full translation.
      fullyIds =
        if (residual.nonEmpty) Set.empty
        else classified.fullyMatching.map(_.id).toSet
    }
    if (rowFilter.isEmpty && filters.nonEmpty) fullyIds = Set.empty
    afterFilterCount = scanEntries.size
    afterLimitCount = scanEntries.size
    residual
  }

  override def pushedFilters(): Array[Filter] = acceptedFilters

  /** Both limit and topN are only partially pushed: Spark keeps the final
    * Limit/TopK operator, so the scan may return any qualifying superset.
    */
  override def isPartiallyPushed(): Boolean = true

  override def pushLimit(limit: Int): Boolean = {
    // Reconstruct the classification LimitPruner expects.
    val classified = FilterPruneResult(scanEntries.map { e =>
      val cls = if (fullyIds.contains(e.id)) MatchClass.FullyMatching
                else MatchClass.PartiallyMatching
      ClassifiedPartition(metaById(e.id), cls)
    })
    val res = LimitPruner.prune(classified, limit.toLong, shapeSupported = true)
    limitOutcomeStr = LimitPruner.bucket(res.outcome)
    res.outcome match {
      case LimitPruner.LimitOutcome.Pruned(_) =>
        val keep = res.scanSet.map(_.id).toSet
        scanEntries = scanEntries.filter(e => keep.contains(e.id))
        afterLimitCount = scanEntries.size
        true
      case _ =>
        afterLimitCount = scanEntries.size
        false
    }
  }

  override def pushTopN(orders: Array[SortOrder], limit: Int): Boolean = {
    if (orders.length != 1) return false
    val o = orders(0)
    val colName = o.expression() match {
      case nr: NamedReference if nr.fieldNames().length == 1 => nr.fieldNames()(0)
      case _ => return false
    }
    val colIdx = manifest.schema.fieldNames.indexOf(colName)
    if (colIdx < 0) return false
    val desc = o.direction() == SortDirection.DESCENDING
    // Boundary pruning assumes nulls sort last; accept NULLS_FIRST only when
    // the column provably contains no nulls.
    val totalNulls = manifest.partitions.map(_.stats(colIdx).nullCount).sum
    if (o.nullOrdering() == NullOrdering.NULLS_FIRST && totalNulls > 0) return false
    topK = Some(TopKPlan(colName, desc, limit))
    true
  }

  override def pruneColumns(requiredSchema: StructType): Unit =
    readSchema = requiredSchema

  override def build(): Scan = {
    val stats = new ScanMetrics.Stats(dir)
    stats.totalPartitions = manifest.partitions.size
    stats.afterFilterPruning = afterFilterCount
    stats.afterLimitPruning = afterLimitCount
    stats.fullyMatching = fullyIds.size
    stats.limitOutcome = limitOutcomeStr

    def bestOf(e: MptPartitionEntry, plan: TopKPlan): Option[Scalar] = {
      val i = manifest.schema.fieldNames.indexOf(plan.orderCol)
      if (plan.desc) e.stats(i).max else e.stats(i).min
    }

    val (entries, scanIdOpt) = topK match {
      case None => (scanEntries, None)
      case Some(plan) =>
        stats.topKPushed = true
        val q = TopKPruner.TopKQuery(plan.orderCol, plan.k, plan.desc)
        val init = TopKPruner.upfrontBoundary(fullyIds.toSeq.map(metaById), q)
        val strictlyBetter = (a: Scalar, b: Scalar) =>
          Scalar.compare(a, b).exists(c => if (plan.desc) c > 0 else c < 0)
        // §5.4 static pruning: below the upfront boundary nothing can qualify.
        val statically = init match {
          case None    => scanEntries
          case Some(b) => scanEntries.filter(e => !bestOf(e, plan).forall(v => strictlyBetter(b, v)))
        }
        // §5.3 processing order: best boundary potential first; all-null last.
        val ordered = statically.sortWith { (x, y) =>
          (bestOf(x, plan), bestOf(y, plan)) match {
            case (Some(a), Some(b)) => strictlyBetter(a, b)
            case (Some(_), None)    => true
            case _                  => false
          }
        }
        val scanId = BoundaryRegistry.create(plan.k, plan.desc, init)
        (ordered, Some(scanId))
    }
    stats.afterTopKStatic = entries.size
    val scanId = scanIdOpt.getOrElse(BoundaryRegistry.create(0, desc = true, None))
    if (scanIdOpt.isEmpty) BoundaryRegistry.remove(scanId)
    ScanMetrics.register(scanId, stats)
    new MptScan(dir, manifest.schema, readSchema, entries, rowFilter,
                topK.filter(_ => scanIdOpt.isDefined), scanId)
  }
}

final case class MptInputPartition(dir: String, file: String, partId: Int,
                                   orderBest: Option[Scalar], scanId: Long)
  extends InputPartition

final class MptScan(dir: String, fullSchema: StructType, required: StructType,
                    entries: Vector[MptPartitionEntry], rowFilter: Option[PExpr],
                    topK: Option[TopKPlan], scanId: Long) extends Scan with Batch {

  override def readSchema(): StructType = required
  override def toBatch: Batch = this
  override def description(): String =
    s"mpt scan of $dir (${entries.size} partitions, topK=$topK, filter=$rowFilter)"

  override def planInputPartitions(): Array[InputPartition] = {
    val orderIdx = topK.map(p => fullSchema.fieldNames.indexOf(p.orderCol))
    entries.map { e =>
      val best = (topK, orderIdx) match {
        case (Some(p), Some(i)) => if (p.desc) e.stats(i).max else e.stats(i).min
        case _                  => None
      }
      MptInputPartition(dir, e.file, e.id, best, scanId): InputPartition
    }.toArray
  }

  override def createReaderFactory(): PartitionReaderFactory =
    new MptReaderFactory(fullSchema, required, rowFilter, topK)
}

final class MptReaderFactory(fullSchema: StructType, required: StructType,
                             rowFilter: Option[PExpr], topK: Option[TopKPlan])
  extends PartitionReaderFactory {

  override def createReader(partition: InputPartition): PartitionReader[InternalRow] = {
    val p = partition.asInstanceOf[MptInputPartition]
    val stats = ScanMetrics.forScan(p.scanId)
    val state = topK.flatMap(_ => BoundaryRegistry.get(p.scanId))

    // Runtime top-k pruning (§5.2): consult the shared boundary *now*, after
    // earlier tasks may have tightened it beyond the plan-time value.
    if (state.exists(_.shouldSkipPartition(p.orderBest))) {
      stats.foreach(_.runtimeSkipped.incrementAndGet())
      return new PartitionReader[InternalRow] {
        override def next(): Boolean = false
        override def get(): InternalRow = throw new IllegalStateException("empty")
        override def close(): Unit = ()
      }
    }

    stats.foreach(_.filesOpened.incrementAndGet())
    val file = new java.io.File(p.dir, p.file)
    val reader = new java.io.BufferedReader(new java.io.FileReader(file), 1 << 20)
    val nameIdx = fullSchema.fieldNames.zipWithIndex.toMap
    val outIdx = required.fieldNames.map(nameIdx)
    val orderIdx = topK.map(t => nameIdx(t.orderCol))

    new PartitionReader[InternalRow] {
      private var current: InternalRow = _
      private val values = new Array[Scalar](fullSchema.length)
      private val lookup: PExprEval.RowLookup = name => nameIdx.get(name).flatMap(i => Option(values(i)))

      override def next(): Boolean = {
        var line = reader.readLine()
        while (line != null) {
          val fields = line.split("\t", -1) // -1: keep trailing empty strings
          var i = 0
          while (i < fullSchema.length) {
            values(i) = MptSchema.decodeField(fields(i), fullSchema.fields(i).dataType)
            i += 1
          }
          val passes = rowFilter.forall(PExprEval.passes(_, lookup))
          if (passes) {
            val emit = (state, orderIdx) match {
              case (Some(st), Some(oi)) =>
                val v = Option(values(oi))
                v.foreach(st.observe) // tighten the boundary first …
                !st.shouldSuppressRow(v) // … then drop rows provably out of top-k
              case _ => true
            }
            if (emit) {
              val row = new GenericInternalRow(outIdx.length)
              var j = 0
              while (j < outIdx.length) {
                row.update(j, MptSchema.toInternal(values(outIdx(j)), required.fields(j).dataType))
                j += 1
              }
              current = row
              stats.foreach(_.rowsEmitted.incrementAndGet())
              return true
            }
          }
          line = reader.readLine()
        }
        false
      }

      override def get(): InternalRow = current
      override def close(): Unit = reader.close()
    }
  }
}
