package repro.store

import java.io._
import java.nio.file.{Files, Paths}
import java.util.zip.{Deflater, DeflaterOutputStream, InflaterInputStream}
import org.apache.spark.TaskContext
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions.col
import org.apache.spark.sql.types.{LongType, StructField, StructType}
import scala.jdk.CollectionConverters._

/** The paper's Turbo-RC baseline: a custom columnar format applying
  * state-of-the-art integer compression per column — run-length encoding
  * combined with integer entropy coding. Our implementation encodes each
  * column with either RLE (when runs pay off) or delta+zigzag varints, and
  * entropy-codes the payload with Deflate. Unlike ProvRC it must be fully
  * decompressed before querying.
  */
object TurboRC {

  private val Magic = 0x54524331 // "TRC1"

  // ----------------------------------------------------------- varints

  private def writeVarLong(o: DataOutputStream, v0: Long): Unit = {
    var v = v0
    while ((v & ~0x7fL) != 0) { o.write(((v & 0x7f) | 0x80).toInt); v >>>= 7 }
    o.write(v.toInt)
  }

  private def readVarLong(in: InputStream): Long = {
    var shift = 0; var res = 0L
    while (true) {
      val b = in.read()
      if (b < 0) throw new EOFException
      res |= (b.toLong & 0x7f) << shift
      if ((b & 0x80) == 0) return res
      shift += 7
    }
    res
  }

  private def zz(v: Long): Long = (v << 1) ^ (v >> 63)
  private def unzz(v: Long): Long = (v >>> 1) ^ -(v & 1)

  // ------------------------------------------------------ column codec

  /** Encode one column: tag 1 = RLE of (zigzag delta of run value, run
    * length), tag 0 = zigzag delta stream.
    */
  private[store] def encodeColumn(vals: Array[Long]): Array[Byte] = {
    val bos = new ByteArrayOutputStream()
    val d = new DataOutputStream(bos)
    var runs = 1
    var i = 1
    while (i < vals.length) { if (vals(i) != vals(i - 1)) runs += 1; i += 1 }
    if (vals.isEmpty) { d.writeByte(0) }
    else if (runs.toLong * 2 <= vals.length) {
      d.writeByte(1)
      writeVarLong(d, runs.toLong)
      var prev = 0L
      i = 0
      while (i < vals.length) {
        val v = vals(i)
        var len = 1L
        while (i + len < vals.length && vals(i + len.toInt) == v) len += 1
        writeVarLong(d, zz(v - prev)); writeVarLong(d, len)
        prev = v
        i += len.toInt
      }
    } else {
      d.writeByte(0)
      var prev = 0L
      i = 0
      while (i < vals.length) { writeVarLong(d, zz(vals(i) - prev)); prev = vals(i); i += 1 }
    }
    bos.toByteArray
  }

  private[store] def decodeColumn(bytes: Array[Byte], n: Int): Array[Long] = {
    val in = new ByteArrayInputStream(bytes)
    val tag = in.read()
    val out = new Array[Long](n)
    if (tag == 1) {
      val runs = readVarLong(in)
      var prev = 0L; var pos = 0; var r = 0L
      while (r < runs) {
        val v = prev + unzz(readVarLong(in))
        val len = readVarLong(in)
        var k = 0L
        while (k < len) { out(pos) = v; pos += 1; k += 1 }
        prev = v; r += 1
      }
    } else {
      var prev = 0L; var i = 0
      while (i < n) { prev += unzz(readVarLong(in)); out(i) = prev; i += 1 }
    }
    out
  }

  // ------------------------------------------------------------- files

  private def writeFile(path: String, cols: Array[Array[Long]], nRows: Int): Unit = {
    val raw = new BufferedOutputStream(new FileOutputStream(path))
    val defl = new DeflaterOutputStream(raw, new Deflater(Deflater.BEST_COMPRESSION))
    val d = new DataOutputStream(defl)
    d.writeInt(Magic)
    d.writeInt(cols.length)
    d.writeInt(nRows)
    cols.foreach { c =>
      val enc = encodeColumn(c)
      d.writeInt(enc.length)
      d.write(enc)
    }
    d.close()
  }

  private def readFile(path: String): Array[Array[Long]] = {
    val in = new DataInputStream(
      new BufferedInputStream(new InflaterInputStream(new FileInputStream(path))))
    try {
      require(in.readInt() == Magic, "not a Turbo-RC file")
      val nCols = in.readInt()
      val nRows = in.readInt()
      Array.fill(nCols) {
        val len = in.readInt()
        val buf = new Array[Byte](len)
        in.readFully(buf)
        decodeColumn(buf, nRows)
      }
    } finally in.close()
  }

  /** Write `df` (all columns castable to long) as one Turbo-RC file per
    * partition under `dir`, plus a `_schema` file.
    */
  def write(df: DataFrame, dir: String): Unit = {
    IOUtil.deleteRecursively(dir)
    IOUtil.ensureDir(dir)
    val names = df.columns
    Files.write(Paths.get(dir, "_schema"), names.mkString(",").getBytes)
    val casted = df.select(names.map(c => col(c).cast(LongType).as(c)): _*)
    val n = names.length
    casted.foreachPartition { (it: Iterator[Row]) =>
      val bufs = Array.fill(n)(scala.collection.mutable.ArrayBuilder.make[Long])
      var rows = 0
      it.foreach { r =>
        var i = 0
        while (i < n) { bufs(i) += r.getLong(i); i += 1 }
        rows += 1
      }
      if (rows > 0) {
        val pid = TaskContext.getPartitionId()
        writeFile(s"$dir/part-$pid.trc", bufs.map(_.result()), rows)
      }
    }
  }

  /** Read a Turbo-RC directory back into a DataFrame (decompression — the
    * step that dominates its query latency).
    */
  def read(spark: SparkSession, dir: String): DataFrame = {
    val names = new String(Files.readAllBytes(Paths.get(dir, "_schema"))).split(",")
    val files = Files
      .list(Paths.get(dir))
      .iterator()
      .asScala
      .map(_.toString)
      .filter(_.endsWith(".trc"))
      .toSeq
    val schema = StructType(names.map(n => StructField(n, LongType, nullable = false)))
    val rdd = spark.sparkContext
      .parallelize(files, math.max(1, files.size))
      .flatMap { f =>
        val cols = readFile(f)
        val nRows = if (cols.isEmpty) 0 else cols(0).length
        (0 until nRows).iterator.map(r => Row.fromSeq(cols.map(_(r)).toSeq))
      }
    spark.createDataFrame(rdd, schema)
  }
}
