package repro.store

import java.nio.file.{Files, Path, Paths}
import scala.jdk.CollectionConverters._

/** Small filesystem helpers shared by the storage-format implementations. */
object IOUtil {

  /** Total size in bytes of the visible files under `path` (recursively),
    * excluding Hadoop checksum/marker files — the quantity Table VII
    * reports.
    */
  def sizeBytes(path: String): Long = {
    val p = Paths.get(path)
    if (!Files.exists(p)) return 0L
    if (Files.isRegularFile(p)) return Files.size(p)
    Files
      .walk(p)
      .iterator()
      .asScala
      .filter(f => Files.isRegularFile(f))
      .filterNot { f =>
        val n = f.getFileName.toString
        n.startsWith(".") || n.startsWith("_")
      }
      .map(Files.size)
      .sum
  }

  def deleteRecursively(path: String): Unit = {
    val p = Paths.get(path)
    if (Files.exists(p)) {
      Files.walk(p).iterator().asScala.toSeq.reverse.foreach(Files.deleteIfExists(_))
    }
  }

  def ensureDir(path: String): Path = {
    val p = Paths.get(path)
    Files.createDirectories(p)
    p
  }

  def mb(bytes: Long): Double = bytes / (1024.0 * 1024.0)
}
