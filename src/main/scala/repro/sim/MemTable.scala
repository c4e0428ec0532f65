package repro.sim

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

import repro.core.{PartitionData, PExprEval}
import repro.meta._

/** One in-memory micro-partition: a row-major array of [[Scalar]] values
  * (null = SQL NULL) plus derived zone-map metadata.
  *
  * This is the simulator's stand-in for a Snowflake micro-partition on
  * object storage: the pruners only ever see [[meta]]; row access models
  * "loading the partition".
  */
final class MemPartition(val id: Int, val schema: IndexedSeq[String],
                         val data: Array[Array[Scalar]]) extends PartitionData {
  private val colIdx: Map[String, Int] = schema.zipWithIndex.toMap

  lazy val meta: PartitionMeta = {
    val stats = schema.zipWithIndex.map { case (name, i) =>
      var nulls = 0L
      var lo: Option[Scalar] = None
      var hi: Option[Scalar] = None
      var r = 0
      while (r < data.length) {
        val v = data(r)(i)
        if (v == null) nulls += 1
        else {
          lo = lo.flatMap(Scalar.min(_, v)).orElse(Some(v))
          hi = hi.flatMap(Scalar.max(_, v)).orElse(Some(v))
        }
        r += 1
      }
      name -> ColumnStats(lo, hi, nulls)
    }.toMap
    PartitionMeta(id, data.length.toLong, stats)
  }

  def lookupAt(r: Int): PExprEval.RowLookup =
    name => colIdx.get(name).flatMap(i => Option(data(r)(i)))

  def rows: Iterator[PExprEval.RowLookup] = data.indices.iterator.map(lookupAt)

  def rowCount: Int = data.length
}

/** An in-memory micro-partitioned table. */
final class MemTable(val name: String, val schema: IndexedSeq[String],
                     val partitions: Vector[MemPartition]) {
  def metas: Seq[PartitionMeta] = partitions.map(_.meta)
  def partition(id: Int): MemPartition = partitions(id)
  def numPartitions: Int = partitions.size
  def totalRows: Long = partitions.map(_.rowCount.toLong).sum

  /** Materialize as a Spark DataFrame (for oracle cross-checks). Column
    * types are inferred from the first non-null value per column.
    */
  def toDF(spark: SparkSession): DataFrame = {
    val allRows = partitions.flatMap(_.data)
    val types: IndexedSeq[DataType] = schema.indices.map { i =>
      allRows.iterator.map(_(i)).collectFirst {
        case Scalar.LongV(_)   => LongType
        case Scalar.DoubleV(_) => DoubleType
        case Scalar.StringV(_) => StringType
        case Scalar.DateV(_)   => DateType
        case Scalar.BoolV(_)   => BooleanType
      }.getOrElse(StringType)
    }
    val structType = StructType(schema.zip(types).map { case (n, t) => StructField(n, t, nullable = true) })
    val sparkRows = allRows.map { arr =>
      Row.fromSeq(arr.toSeq.map {
        case null              => null
        case Scalar.LongV(v)   => v
        case Scalar.DoubleV(v) => v
        case Scalar.StringV(v) => v
        case Scalar.DateV(d)   => java.sql.Date.valueOf(java.time.LocalDate.ofEpochDay(d.toLong))
        case Scalar.BoolV(v)   => v
      })
    }
    spark.createDataFrame(spark.sparkContext.parallelize(sparkRows.toSeq, math.max(1, partitions.size)), structType)
  }
}

object MemTable {

  /** Physical layout of rows across micro-partitions — the paper stresses
    * that pruning effectiveness is primarily a function of layout (§1, §5.3).
    */
  sealed trait Layout extends Product with Serializable
  object Layout {
    /** Perfectly sorted by `col` — disjoint min/max ranges. */
    final case class Sorted(col: String) extends Layout
    /** Sorted by `col` + noise: adjacent partitions overlap, modelling
      * natural clustering (e.g. event time with late arrivals).
      * `jitter` is the fraction of the value range a row may move.
      */
    final case class Clustered(col: String, jitter: Double, seed: Long) extends Layout
    /** Rows shuffled uniformly — worst case for min/max pruning. */
    final case class Random(seed: Long) extends Layout
  }

  /** Split rows into `numPartitions` equal chunks after arranging them per
    * the layout. Row arrays may contain nulls (SQL NULL).
    */
  def build(name: String, schema: IndexedSeq[String], rows: IndexedSeq[Array[Scalar]],
            numPartitions: Int, layout: Layout): MemTable = {
    val colIdx = schema.zipWithIndex.toMap
    val arranged: IndexedSeq[Array[Scalar]] = layout match {
      case Layout.Sorted(col) =>
        val i = colIdx(col)
        rows.sortWith((a, b) => scalarLt(a(i), b(i)))
      case Layout.Clustered(col, jitter, seed) =>
        val i = colIdx(col)
        val sorted = rows.sortWith((a, b) => scalarLt(a(i), b(i)))
        val rnd = new scala.util.Random(seed)
        val n = sorted.size
        // Jitter each row's position by up to `jitter` × n slots, then re-sort
        // by the noisy position: preserves global order, adds local overlap.
        sorted.zipWithIndex
          .map { case (r, pos) => (pos + (rnd.nextGaussian() * jitter * n), r) }
          .sortBy(_._1).map(_._2)
      case Layout.Random(seed) =>
        new scala.util.Random(seed).shuffle(rows)
    }
    val n = math.max(1, numPartitions)
    val per = math.max(1, (arranged.size + n - 1) / n)
    val parts = arranged.grouped(per).zipWithIndex.map { case (chunk, i) =>
      new MemPartition(i, schema, chunk.map(identity).toArray)
    }.toVector
    new MemTable(name, schema, parts)
  }

  private def scalarLt(a: Scalar, b: Scalar): Boolean = (a, b) match {
    case (null, null) => false
    case (null, _)    => true // nulls first in layout ordering (arbitrary but stable)
    case (_, null)    => false
    case _            => Scalar.lt(a, b).contains(true)
  }
}
