package repro.provrc

import java.io._
import java.nio.file.{Files, Path}
import java.util.zip.{GZIPInputStream, GZIPOutputStream}

/** Compact binary serialization for ProvRC-compressed lineage tables.
  *
  * Layout (all varints; signed values zig-zag encoded):
  * {{{
  *   magic "PRC1" | nOut | nIn | rowCount
  *   per row:
  *     per output axis: zz(lo), (hi - lo)
  *     per input axis : tag (0 = Abs, 1 + j = Rel against axis j),
  *                      zz(lo), (hi - lo)
  * }}}
  * The optional gzip wrapper is the paper's ProvRC-GZip variant.
  */
object Codec {

  private val Magic = 0x50524331 // "PRC1"

  // ------------------------------------------------------------- varints

  private def writeVarLong(o: OutputStream, v0: Long): Unit = {
    var v = v0
    require(v >= 0, s"varint must be non-negative: $v")
    while ((v & ~0x7fL) != 0) { o.write(((v & 0x7f) | 0x80).toInt); v >>>= 7 }
    o.write(v.toInt)
  }

  private def zigzag(v: Long): Long = (v << 1) ^ (v >> 63)
  private def unzigzag(v: Long): Long = (v >>> 1) ^ -(v & 1)

  private def readVarLong(in: InputStream): Long = {
    var shift = 0
    var result = 0L
    while (true) {
      val b = in.read()
      if (b < 0) throw new EOFException("truncated varint")
      result |= (b.toLong & 0x7f) << shift
      if ((b & 0x80) == 0) return result
      shift += 7
    }
    result
  }

  // ------------------------------------------------------------ encoding

  def write(o: OutputStream, rows: Iterable[CRow], nOut: Int, nIn: Int): Unit = {
    val d = new DataOutputStream(o)
    d.writeInt(Magic)
    writeVarLong(d, nOut.toLong)
    writeVarLong(d, nIn.toLong)
    writeVarLong(d, rows.size.toLong)
    rows.foreach { r =>
      require(r.out.size == nOut && r.in.size == nIn, "row arity mismatch")
      r.out.foreach { iv => writeVarLong(d, zigzag(iv.lo)); writeVarLong(d, iv.hi - iv.lo) }
      r.in.foreach {
        case AbsEnc(iv) =>
          writeVarLong(d, 0L)
          writeVarLong(d, zigzag(iv.lo)); writeVarLong(d, iv.hi - iv.lo)
        case RelEnc(j, dd) =>
          writeVarLong(d, 1L + j)
          writeVarLong(d, zigzag(dd.lo)); writeVarLong(d, dd.hi - dd.lo)
      }
    }
    d.flush()
  }

  def read(in0: InputStream): (Vector[CRow], Int, Int) = {
    val in = new DataInputStream(new BufferedInputStream(in0))
    require(in.readInt() == Magic, "not a ProvRC table")
    val nOut = readVarLong(in).toInt
    val nIn = readVarLong(in).toInt
    val n = readVarLong(in).toLong
    val rows = Vector.newBuilder[CRow]
    var i = 0L
    while (i < n) {
      val out = Vector.fill(nOut) {
        val lo = unzigzag(readVarLong(in)); Interval(lo, lo + readVarLong(in))
      }
      val inn = Vector.fill(nIn) {
        val tag = readVarLong(in)
        val lo = unzigzag(readVarLong(in))
        val iv = Interval(lo, lo + readVarLong(in))
        if (tag == 0) AbsEnc(iv): InEnc else RelEnc((tag - 1).toInt, iv)
      }
      rows += CRow(out, inn)
      i += 1
    }
    (rows.result(), nOut, nIn)
  }

  def encode(rows: Iterable[CRow], nOut: Int, nIn: Int): Array[Byte] = {
    val bos = new ByteArrayOutputStream()
    write(bos, rows, nOut, nIn)
    bos.toByteArray
  }

  def decode(bytes: Array[Byte]): (Vector[CRow], Int, Int) =
    read(new ByteArrayInputStream(bytes))

  // --------------------------------------------------------------- files

  def writeFile(path: Path, rows: Iterable[CRow], nOut: Int, nIn: Int, gzip: Boolean): Unit = {
    Files.createDirectories(path.getParent)
    val raw = new BufferedOutputStream(Files.newOutputStream(path))
    val o = if (gzip) new GZIPOutputStream(raw) else raw
    try write(o, rows, nOut, nIn)
    finally o.close()
  }

  def readFile(path: Path, gzip: Boolean): (Vector[CRow], Int, Int) = {
    val raw = Files.newInputStream(path)
    val in = if (gzip) new GZIPInputStream(raw) else raw
    try read(in)
    finally in.close()
  }
}
