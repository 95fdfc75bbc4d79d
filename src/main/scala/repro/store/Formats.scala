package repro.store

import java.io._
import java.nio.file.{Files, Paths}
import org.apache.spark.TaskContext
import org.apache.spark.sql.{DataFrame, Row, SaveMode, SparkSession}
import org.apache.spark.sql.functions.col
import org.apache.spark.sql.types.{LongType, StructField, StructType}
import scala.jdk.CollectionConverters._

/** The storage formats compared in Table VII (paper Section VII-B).
  * Each format writes a lineage relation to local disk and reads it back as
  * a DataFrame; `IOUtil.sizeBytes` measures the on-disk footprint.
  */
object Formats {

  private def longSchema(names: Seq[String]): StructType =
    StructType(names.map(n => StructField(n, LongType, nullable = false)))

  private def casted(df: DataFrame): DataFrame =
    df.select(df.columns.map(c => col(c).cast(LongType).as(c)).toSeq: _*)

  // --------------------------------------------------------------- Raw

  /** Row-oriented, uncompressed (the paper's Ground-style Raw baseline):
    * plain CSV, no codec.
    */
  object RawCsv {
    def write(df: DataFrame, dir: String): Unit = {
      IOUtil.deleteRecursively(dir)
      casted(df).write.mode(SaveMode.Overwrite).option("compression", "none").csv(dir)
      Files.write(Paths.get(dir, "_schema"), df.columns.mkString(",").getBytes)
    }

    def read(spark: SparkSession, dir: String): DataFrame = {
      val names = new String(Files.readAllBytes(Paths.get(dir, "_schema"))).split(",").toSeq
      spark.read.schema(longSchema(names)).csv(dir)
    }
  }

  // ------------------------------------------------------------- Array

  /** The paper's numpy-array baseline: the relation stored as a packed
    * row-major int64 binary (one file per partition), queried by scans.
    */
  object ArrayBin {
    def write(df: DataFrame, dir: String): Unit = {
      IOUtil.deleteRecursively(dir)
      IOUtil.ensureDir(dir)
      val names = df.columns
      Files.write(Paths.get(dir, "_schema"), names.mkString(",").getBytes)
      val n = names.length
      casted(df).foreachPartition { (it: Iterator[Row]) =>
        if (it.hasNext) {
          val pid = TaskContext.getPartitionId()
          val out = new DataOutputStream(
            new BufferedOutputStream(new FileOutputStream(s"$dir/part-$pid.bin"), 1 << 20))
          try {
            it.foreach { r =>
              var i = 0
              while (i < n) { out.writeLong(r.getLong(i)); i += 1 }
            }
          } finally out.close()
        }
      }
    }

    def columnNames(dir: String): Seq[String] =
      new String(Files.readAllBytes(Paths.get(dir, "_schema"))).split(",").toSeq

    /** Load the full relation into driver memory as column arrays — the
      * ingestion step of the vectorized Array query baseline.
      */
    def readColumns(dir: String): Array[Array[Long]] = {
      val names = columnNames(dir)
      val n = names.size
      val files = Files.list(Paths.get(dir)).iterator().asScala
        .filter(_.toString.endsWith(".bin")).toSeq.sortBy(_.toString)
      val totalRows = files.map(f => Files.size(f) / (8L * n)).sum
      val cols = Array.fill(n)(new Array[Long](totalRows.toInt))
      var row = 0
      files.foreach { f =>
        val in = new DataInputStream(new BufferedInputStream(Files.newInputStream(f), 1 << 20))
        try {
          val rows = (Files.size(f) / (8L * n)).toInt
          var r = 0
          while (r < rows) {
            var i = 0
            while (i < n) { cols(i)(row) = in.readLong(); i += 1 }
            row += 1; r += 1
          }
        } finally in.close()
      }
      cols
    }

    def read(spark: SparkSession, dir: String): DataFrame = {
      val names = columnNames(dir)
      val cols = readColumns(dir)
      val nRows = if (cols.isEmpty) 0 else cols(0).length
      val rows = (0 until nRows).map(r => Row.fromSeq(cols.map(_(r)).toSeq))
      spark.createDataFrame(spark.sparkContext.parallelize(rows), longSchema(names))
    }
  }

  // ----------------------------------------------------------- Parquet

  object Parquet {
    def write(df: DataFrame, dir: String, codec: String): Unit = {
      IOUtil.deleteRecursively(dir)
      casted(df).write.mode(SaveMode.Overwrite).option("compression", codec).parquet(dir)
    }

    def read(spark: SparkSession, dir: String): DataFrame = spark.read.parquet(dir)
  }
}
