package repro.core

import java.nio.file.{Files, Paths}
import java.util.Properties
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.GenericInternalRow
import org.apache.spark.sql.connector.catalog.{SupportsRead, Table, TableCapability, TableProvider}
import org.apache.spark.sql.connector.expressions.Transform
import org.apache.spark.sql.connector.read._
import org.apache.spark.sql.sources._
import org.apache.spark.sql.types.{LongType, StructField, StructType}
import org.apache.spark.sql.util.CaseInsensitiveStringMap
import repro.provrc._
import scala.jdk.CollectionConverters._

/** A DataSourceV2 `TableProvider` exposing a ProvRC-compressed lineage
  * table as a relational table with the *uncompressed* schema (key-side
  * axis columns first, then value-side), `format("provrc")`.
  *
  * Range/equality predicates on the key-side (absolutely indexed) columns
  * are pushed into the scan and evaluated in situ, per partition, in the
  * executors: each compressed row is range-joined against the pushed
  * bounds and only the intersected region is expanded — a filtered scan
  * never decompresses what it does not return. This is the paper's §IV-C
  * "predicates push down only on absolutely indexed columns" materialized
  * as a Spark extension point.
  */
object ProvRCTable {

  /** Write a table directory: the compressed rows + a `_meta` sidecar. */
  def write(
      dir: String,
      rows: Vector[CRow],
      nOut: Int,
      nIn: Int,
      keyNames: Seq[String],
      valNames: Seq[String],
      gzip: Boolean = false,
  ): Unit = {
    require(keyNames.size == nOut && valNames.size == nIn)
    val d = Paths.get(dir)
    Files.createDirectories(d)
    Codec.writeFile(d.resolve("table.prc"), rows, nOut, nIn, gzip)
    val p = new Properties()
    p.setProperty("nOut", nOut.toString)
    p.setProperty("nIn", nIn.toString)
    p.setProperty("names", (keyNames ++ valNames).mkString(","))
    p.setProperty("gzip", gzip.toString)
    val out = Files.newOutputStream(d.resolve("_meta"))
    try p.store(out, "provrc table")
    finally out.close()
  }

  private[core] final case class Meta(nOut: Int, nIn: Int, names: Seq[String], gzip: Boolean)

  private[core] def readMeta(dir: String): Meta = {
    val p = new Properties()
    val in = Files.newInputStream(Paths.get(dir, "_meta"))
    try p.load(in)
    finally in.close()
    Meta(
      p.getProperty("nOut").toInt,
      p.getProperty("nIn").toInt,
      p.getProperty("names").split(",").toSeq,
      p.getProperty("gzip").toBoolean,
    )
  }

  private[core] def schemaOf(meta: Meta): StructType =
    StructType(meta.names.map(n => StructField(n, LongType, nullable = false)))

  /** Bound sentinel for unconstrained axes — wide enough to cover any real
    * index, narrow enough that delta arithmetic cannot overflow.
    */
  private[core] val Unbounded: Interval = Interval(-(1L << 60), 1L << 60)
}

final class ProvRCDataSource extends TableProvider with DataSourceRegister {
  override def shortName(): String = "provrc"

  override def inferSchema(options: CaseInsensitiveStringMap): StructType =
    ProvRCTable.schemaOf(ProvRCTable.readMeta(options.get("path")))

  override def getTable(
      schema: StructType,
      partitioning: Array[Transform],
      properties: java.util.Map[String, String],
  ): Table = new ProvRCTableImpl(properties.get("path"))
}

private final class ProvRCTableImpl(path: String) extends Table with SupportsRead {
  private val meta = ProvRCTable.readMeta(path)
  override def name(): String = s"provrc:$path"
  override def schema(): StructType = ProvRCTable.schemaOf(meta)
  override def capabilities(): java.util.Set[TableCapability] =
    Set(TableCapability.BATCH_READ).asJava
  override def newScanBuilder(options: CaseInsensitiveStringMap): ScanBuilder =
    new ProvRCScanBuilder(path, meta)
}

private final class ProvRCScanBuilder(path: String, meta: ProvRCTable.Meta)
    extends ScanBuilder with SupportsPushDownFilters {

  private var pushed: Array[Filter] = Array.empty
  private val keyIndex: Map[String, Int] =
    meta.names.take(meta.nOut).zipWithIndex.toMap

  private def pushable(f: Filter): Boolean = f match {
    case EqualTo(a, _: java.lang.Long)            => keyIndex.contains(a)
    case EqualTo(a, _: java.lang.Integer)         => keyIndex.contains(a)
    case GreaterThan(a, _: java.lang.Long)        => keyIndex.contains(a)
    case GreaterThan(a, _: java.lang.Integer)     => keyIndex.contains(a)
    case GreaterThanOrEqual(a, _: java.lang.Long)    => keyIndex.contains(a)
    case GreaterThanOrEqual(a, _: java.lang.Integer) => keyIndex.contains(a)
    case LessThan(a, _: java.lang.Long)           => keyIndex.contains(a)
    case LessThan(a, _: java.lang.Integer)        => keyIndex.contains(a)
    case LessThanOrEqual(a, _: java.lang.Long)    => keyIndex.contains(a)
    case LessThanOrEqual(a, _: java.lang.Integer) => keyIndex.contains(a)
    case _                                        => false
  }

  override def pushFilters(filters: Array[Filter]): Array[Filter] = {
    pushed = filters.filter(pushable)
    filters.filterNot(pushable) // residual, evaluated by Spark post-scan
  }

  override def pushedFilters(): Array[Filter] = pushed

  override def build(): Scan = {
    // Fold pushed predicates into one rectangle over the key axes.
    val lo = Array.fill(meta.nOut)(ProvRCTable.Unbounded.lo)
    val hi = Array.fill(meta.nOut)(ProvRCTable.Unbounded.hi)
    def num(v: Any): Long = v match {
      case l: java.lang.Long    => l.longValue()
      case i: java.lang.Integer => i.longValue()
      case other                => other.toString.toLong
    }
    pushed.foreach {
      case EqualTo(a, v) =>
        val i = keyIndex(a); lo(i) = math.max(lo(i), num(v)); hi(i) = math.min(hi(i), num(v))
      case GreaterThan(a, v)        => val i = keyIndex(a); lo(i) = math.max(lo(i), num(v) + 1)
      case GreaterThanOrEqual(a, v) => val i = keyIndex(a); lo(i) = math.max(lo(i), num(v))
      case LessThan(a, v)           => val i = keyIndex(a); hi(i) = math.min(hi(i), num(v) - 1)
      case LessThanOrEqual(a, v)    => val i = keyIndex(a); hi(i) = math.min(hi(i), num(v))
      case _                        => ()
    }
    val empty = lo.indices.exists(i => lo(i) > hi(i))
    val rect =
      if (empty) Vector.fill(meta.nOut)(ProvRCTable.Unbounded)
      else lo.indices.map(i => Interval(lo(i), hi(i))).toVector
    new ProvRCScan(path, meta, rect, empty)
  }
}

private final case class ProvRCChunk(blob: Array[Byte]) extends InputPartition

private final class ProvRCScan(
    path: String,
    meta: ProvRCTable.Meta,
    rect: Vector[Interval],
    empty: Boolean,
) extends Scan with Batch with Serializable {

  override def readSchema(): StructType = ProvRCTable.schemaOf(meta)
  override def toBatch: Batch = this

  override def planInputPartitions(): Array[InputPartition] = {
    if (empty) return Array.empty
    val (rows, nOut, nIn) =
      Codec.readFile(Paths.get(path, "table.prc"), meta.gzip)
    rows
      .grouped(4096)
      .map(g => ProvRCChunk(Codec.encode(g, nOut, nIn)): InputPartition)
      .toArray
  }

  override def createReaderFactory(): PartitionReaderFactory = {
    val r = rect
    (partition: InputPartition) => new ProvRCPartitionReader(
      partition.asInstanceOf[ProvRCChunk], r)
  }
}

/** Reads one chunk: in-situ range join against the pushed rectangle, then
  * expansion of only the intersected region.
  */
private final class ProvRCPartitionReader(
    chunk: ProvRCChunk,
    rect: Vector[Interval],
) extends PartitionReader[InternalRow] {

  private val iter: Iterator[Array[Long]] = {
    val (rows, _, _) = Codec.decode(chunk.blob)
    val filtered = rows.flatMap { r =>
      val inter = r.out.lazyZip(rect).map((o, q) => o.intersect(q))
      if (inter.exists(_.isEmpty)) None
      else Some(CRow(inter.map(_.get).toVector, r.in))
    }
    ProvRC.decompress(filtered)
  }

  private var current: Array[Long] = _

  override def next(): Boolean = {
    if (iter.hasNext) { current = iter.next(); true } else false
  }

  override def get(): InternalRow =
    new GenericInternalRow(current.map(v => v: Any))

  override def close(): Unit = ()
}
