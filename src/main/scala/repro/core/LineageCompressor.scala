package repro.core

import org.apache.spark.sql.{DataFrame, Encoders}
import org.apache.spark.sql.functions.col
import org.apache.spark.sql.types.LongType
import repro.provrc.{CRow, Codec, ProvRC}

/** Distributed ProvRC compression on Spark.
  *
  * The relation is range-partitioned and sorted on all attributes (the
  * paper's step-0 sort), each partition is compressed independently with
  * the local ProvRC algorithm in the executors, and the per-partition
  * results are re-merged on the driver to recover the merges lost at
  * partition boundaries. The paper notes ProvRC is "highly parallelizable";
  * this is that implementation.
  */
object LineageCompressor {

  /** Above this many compressed rows the driver-side boundary re-merge is
    * skipped (the table is essentially incompressible and re-sorting it
    * buys nothing but latency). Correctness is unaffected.
    */
  val RemergeLimit: Int = 4_000_000

  /** Compress a lineage relation whose first `nOut` columns are the
    * key-side (absolutely indexed) axes and the rest the value-side axes.
    * Rows must be distinct unless `dedupe` is set.
    */
  def compress(
      df: DataFrame,
      nOut: Int,
      partitions: Int = 0,
      dedupe: Boolean = false,
  ): Vector[CRow] = {
    val cols = df.columns.toSeq
    val nIn = cols.size - nOut
    require(nOut >= 1 && nIn >= 0, s"bad arity: nOut=$nOut over ${cols.size} columns")
    val spark = df.sparkSession

    val casted = df.select(cols.map(c => col(c).cast(LongType).as(c)): _*)
    val deduped = if (dedupe) casted.distinct() else casted
    val p =
      if (partitions > 0) partitions
      else math.max(1, spark.sparkContext.defaultParallelism)
    val sorted = deduped
      .repartitionByRange(p, cols.map(col): _*)
      .sortWithinPartitions(cols.map(col): _*)

    val n = cols.size
    val blobs = sorted
      .mapPartitions { it =>
        val rows = it.map { r =>
          val a = new Array[Long](n)
          var i = 0
          while (i < n) { a(i) = r.getLong(i); i += 1 }
          a
        }
        val c = ProvRC.compress(rows, nOut, nIn)
        if (c.isEmpty) Iterator.empty else Iterator.single(Codec.encode(c, nOut, nIn))
      }(Encoders.BINARY)
      .collect()

    val all = blobs.iterator.flatMap(b => Codec.decode(b)._1).toVector
    if (all.size <= RemergeLimit) ProvRC.remerge(all, nOut, nIn) else all
  }

  /** Compress with an explicit key/value column split (columns may appear in
    * any order in `df`).
    */
  def compressRelation(
      df: DataFrame,
      keyCols: Seq[String],
      valCols: Seq[String],
      partitions: Int = 0,
  ): Vector[CRow] =
    compress(df.select((keyCols ++ valCols).map(col): _*), keyCols.size, partitions)
}
