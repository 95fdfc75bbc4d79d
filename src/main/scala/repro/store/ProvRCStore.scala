package repro.store

import java.nio.file.{Files, Paths}
import repro.provrc.{CRow, Codec}

/** On-disk storage for ProvRC-compressed lineage tables (the ProvRC and
  * ProvRC-GZip columns of Table VII). A table is one binary file; gzip is
  * the paper's ProvRC-GZip variant that wins on unstructured lineage.
  */
object ProvRCStore {

  def write(path: String, rows: Vector[CRow], nOut: Int, nIn: Int, gzip: Boolean): Unit = {
    val p = Paths.get(path)
    if (p.getParent != null) Files.createDirectories(p.getParent)
    Codec.writeFile(p, rows, nOut, nIn, gzip)
  }

  def read(path: String, gzip: Boolean): (Vector[CRow], Int, Int) =
    Codec.readFile(Paths.get(path), gzip)

  def sizeBytes(path: String): Long = IOUtil.sizeBytes(path)
}
