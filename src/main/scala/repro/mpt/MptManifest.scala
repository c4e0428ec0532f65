package repro.mpt

import java.io.File
import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Paths}

import org.apache.spark.sql.types.{StructField, StructType}

import repro.meta.{ColumnStats, PartitionMeta}

/** The mpt table manifest: schema + per-partition zone-map metadata.
  *
  * This is the moral equivalent of Snowflake's metadata service / an Iceberg
  * manifest file: it lets the planner prune micro-partitions without opening
  * any data file. Stored as `_manifest.mpt` next to the partition files.
  *
  * Format (TSV lines):
  * {{{
  * mpt-v1
  * col <TAB> name <TAB> type                        (one per column)
  * part <TAB> id <TAB> file <TAB> rowCount <TAB> (min max nullCount)*
  * }}}
  */
final case class MptManifest(schema: StructType, partitions: Vector[MptPartitionEntry]) {
  def metas: Seq[PartitionMeta] = partitions.map(_.meta(schema))
  def entry(id: Int): MptPartitionEntry = partitions(id)
}

/** One micro-partition: data file name + row count + per-column stats
  * (aligned with the manifest schema order).
  */
final case class MptPartitionEntry(id: Int, file: String, rowCount: Long,
                                   stats: Vector[ColumnStats]) {
  def meta(schema: StructType): PartitionMeta =
    PartitionMeta(id, rowCount, schema.fieldNames.zip(stats).toMap)
}

object MptManifest {
  val FileName = "_manifest.mpt"

  def write(dir: String, manifest: MptManifest): Unit = {
    val sb = new StringBuilder
    sb.append("mpt-v1\n")
    manifest.schema.fields.foreach { f =>
      sb.append(s"col\t${MptSchema.escape(f.name)}\t${MptSchema.typeName(f.dataType)}\n")
    }
    manifest.partitions.foreach { p =>
      sb.append(s"part\t${p.id}\t${MptSchema.escape(p.file)}\t${p.rowCount}")
      p.stats.zip(manifest.schema.fields).foreach { case (s, f) =>
        val mn = s.min.map(MptSchema.encodeField).getOrElse(MptSchema.NullField)
        val mx = s.max.map(MptSchema.encodeField).getOrElse(MptSchema.NullField)
        sb.append(s"\t$mn\t$mx\t${s.nullCount}")
      }
      sb.append('\n')
    }
    Files.createDirectories(Paths.get(dir))
    Files.write(Paths.get(dir, FileName), sb.toString.getBytes(StandardCharsets.UTF_8))
  }

  def read(dir: String): MptManifest = {
    val path = Paths.get(dir, FileName)
    require(Files.exists(path), s"not an mpt table (no $FileName): $dir")
    val lines = Files.readAllLines(path, StandardCharsets.UTF_8)
    require(!lines.isEmpty && lines.get(0) == "mpt-v1", s"bad manifest header in $dir")

    val cols = Vector.newBuilder[StructField]
    val parts = Vector.newBuilder[MptPartitionEntry]
    var schema: StructType = null
    lines.forEach { line =>
      val f = line.split('\t')
      f(0) match {
        case "col" =>
          cols += StructField(MptSchema.unescape(f(1)), MptSchema.typeOf(f(2)), nullable = true)
        case "part" =>
          if (schema == null) schema = StructType(cols.result())
          val id = f(1).toInt
          val file = MptSchema.unescape(f(2))
          val rowCount = f(3).toLong
          val stats = schema.fields.indices.map { i =>
            val base = 4 + i * 3
            val mn = f(base); val mx = f(base + 1); val nulls = f(base + 2).toLong
            val dt = schema.fields(i).dataType
            ColumnStats(
              if (mn == MptSchema.NullField) None else Some(MptSchema.decodeField(mn, dt)),
              if (mx == MptSchema.NullField) None else Some(MptSchema.decodeField(mx, dt)),
              nulls)
          }.toVector
          parts += MptPartitionEntry(id, file, rowCount, stats)
        case _ => () // header / unknown line kinds: ignore for forward compat
      }
    }
    if (schema == null) schema = StructType(cols.result())
    MptManifest(schema, parts.result())
  }

  def dataFile(dir: String, entry: MptPartitionEntry): File = new File(dir, entry.file)
}
