package repro.mpt

import java.io.{BufferedWriter, File, FileWriter}

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions.{col, rand}

import repro.meta.{ColumnStats, Scalar}

/** Writes a DataFrame as an mpt table: one TSV file per micro-partition plus
  * a manifest with per-partition zone maps.
  *
  * The physical layout is the knob the paper keeps pointing at: sorted /
  * clustered layouts give pruning-friendly disjoint ranges, random layouts
  * are the worst case. Stats are computed in the writing task, exactly like
  * an engine computes SMAs while flushing a micro-partition.
  */
object MptWriter {

  sealed trait Layout extends Product with Serializable
  object Layout {
    /** Range-partition + sort by `col`: disjoint per-partition ranges. */
    final case class SortedBy(col: String) extends Layout
    /** Range-partition by `col` + noise (numeric columns only): overlapping
      * but correlated ranges — models natural clustering.
      */
    final case class ClusteredBy(col: String, jitter: Double, seed: Long = 7) extends Layout
    /** Uniform shuffle: min/max pruning is nearly useless. */
    final case class Random(seed: Long = 7) extends Layout
    /** Keep the DataFrame's partitioning as-is. */
    case object AsIs extends Layout
  }

  def write(df: DataFrame, dir: String, numPartitions: Int, layout: Layout): MptManifest = {
    MptSchema.validate(df.schema)
    val arranged = layout match {
      case Layout.SortedBy(c) =>
        df.repartitionByRange(numPartitions, col(c)).sortWithinPartitions(col(c))
      case Layout.ClusteredBy(c, jitter, seed) =>
        val noisy: Column = col(c) + (rand(seed) - 0.5) * jitter
        df.repartitionByRange(numPartitions, noisy).sortWithinPartitions(col(c))
      case Layout.Random(seed) =>
        df.repartition(numPartitions, (rand(seed) * 1e9).cast("long"))
      case Layout.AsIs => df
    }

    // mpt columns are always nullable on read (text format, \N marker).
    val schema = org.apache.spark.sql.types.StructType(
      df.schema.fields.map(_.copy(nullable = true)))
    new File(dir).mkdirs()
    // Local mode: executor threads share the driver's filesystem, so tasks
    // write their partition file directly and return only the stats line.
    val entries = arranged.rdd.mapPartitionsWithIndex { (idx, rows) =>
      val file = f"part-$idx%05d.tsv"
      val out = new BufferedWriter(new FileWriter(new File(dir, file)), 1 << 20)
      val n = schema.fields.length
      val mins = new Array[Scalar](n)
      val maxs = new Array[Scalar](n)
      val nulls = new Array[Long](n)
      var rowCount = 0L
      try {
        rows.foreach { row =>
          val fields = new Array[String](n)
          var i = 0
          while (i < n) {
            val s = MptSchema.scalarFromRowValue(row.get(i), schema.fields(i).dataType)
            if (s == null) nulls(i) += 1
            else {
              if (mins(i) == null || Scalar.lt(s, mins(i)).contains(true)) mins(i) = s
              if (maxs(i) == null || Scalar.lt(maxs(i), s).contains(true)) maxs(i) = s
            }
            fields(i) = MptSchema.encodeField(s)
            i += 1
          }
          out.write(fields.mkString("\t")); out.write('\n')
          rowCount += 1
        }
      } finally out.close()
      val stats = (0 until n).map(i => ColumnStats(Option(mins(i)), Option(maxs(i)), nulls(i))).toVector
      Iterator.single(MptPartitionEntry(idx, file, rowCount, stats))
    }.collect().sortBy(_.id).toVector

    // Re-number densely (some layouts may produce empty partitions).
    val manifest = MptManifest(schema, entries.zipWithIndex.map { case (e, i) => e.copy(id = i) })
    MptManifest.write(dir, manifest)
    manifest
  }
}
