package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.provrc._

/** Multi-hop forward/backward lineage query execution (paper Section V).
  *
  * The DSLog path runs the in-situ θ-join chain over compressed tables; for
  * large compressed tables the range join + de-relativization is shipped to
  * Spark executors per partition (the query rectangles are broadcast), with
  * the projection + merge row-reduction applied between hops. The baseline
  * path materializes the equivalent relational join chain over uncompressed
  * lineage DataFrames, and the Array path scans driver-resident column
  * vectors — mirroring the paper's DuckDB-served and numpy baselines.
  */
object QueryProcessor {
  import ThetaJoin.Rect

  /** Compressed tables above this row count execute their hop in Spark
    * executors; below it the driver is faster than a job launch.
    */
  val SparkHopThreshold: Int = 4096

  /** In-situ multi-hop query. `tables(k)` must be keyed on the axes of the
    * k-th array in the path (forward table for a forward hop, backward
    * table for a backward hop). Returns merged result rectangles over the
    * final array's axes.
    */
  def insitu(
      spark: SparkSession,
      tables: Seq[Vector[CRow]],
      query: Seq[Rect],
      merge: Boolean = true,
      useSpark: Boolean = true,
  ): Vector[Rect] =
    tables.foldLeft(query.toVector) { (q, rows) =>
      if (q.isEmpty) Vector.empty
      else if (useSpark && rows.size > SparkHopThreshold) sparkHop(spark, rows, q, merge)
      else ThetaJoin.join(rows, q, merge)
    }

  private def sparkHop(
      spark: SparkSession,
      rows: Vector[CRow],
      query: Vector[Rect],
      merge: Boolean,
  ): Vector[Rect] = {
    val nOut = rows.head.nOut
    val nIn = rows.head.nIn
    val chunks = rows.grouped(8192).map(g => Codec.encode(g, nOut, nIn)).toSeq
    val bc = spark.sparkContext.broadcast(query)
    try {
      val raw = spark.sparkContext
        .parallelize(chunks, math.min(chunks.size, spark.sparkContext.defaultParallelism))
        .flatMap(blob => ThetaJoin.joinRaw(Codec.decode(blob)._1, bc.value))
        .collect()
        .toVector
      if (merge) ThetaJoin.mergeRects(raw) else raw
    } finally bc.destroy()
  }

  // ------------------------------------------------------ baseline joins

  /** Predicate for "cell lies in one of the query rectangles". */
  def rectPredicate(keyCols: Seq[String], query: Seq[Rect]) =
    query
      .map(rect =>
        keyCols.zip(rect).map { case (c, iv) =>
          col(c) >= iv.lo && col(c) <= iv.hi
        }.reduce(_ && _))
      .reduce(_ || _)

  /** Relational join-chain query over uncompressed lineage DataFrames.
    * `hops(k)` is `(df, nKey)` where the first `nKey` columns are the k-th
    * array's axes and the rest the (k+1)-th array's axes. Returns the
    * distinct cells of the final array.
    */
  def joinChain(hops: Seq[(DataFrame, Int)], query: Seq[Rect]): DataFrame = {
    require(hops.nonEmpty)
    var frontier: DataFrame = null
    hops.zipWithIndex.foreach { case ((df, nKey), idx) =>
      val keyCols = df.columns.take(nKey).toSeq
      val valCols = df.columns.drop(nKey).toSeq
      val joined =
        if (idx == 0) df.filter(rectPredicate(keyCols, query))
        else {
          val renamed = frontier.toDF(keyCols: _*)
          df.join(renamed, keyCols, "leftsemi")
        }
      frontier = joined.select(valCols.map(col): _*).distinct()
    }
    frontier
  }

  /** The Array baseline: full scans over driver-resident column vectors
    * with hash-set membership per hop (the analogue of the paper's batched
    * vectorized numpy equality query).
    */
  def arrayScanChain(
      hops: Seq[(Array[Array[Long]], Int)],
      query: Seq[Rect],
  ): Set[Vector[Long]] = {
    var frontier: Set[Vector[Long]] = null
    hops.zipWithIndex.foreach { case ((cols, nKey), idx) =>
      val nRows = if (cols.isEmpty) 0 else cols(0).length
      val nVal = cols.length - nKey
      val next = Set.newBuilder[Vector[Long]]
      var r = 0
      while (r < nRows) {
        val keyMatch =
          if (idx == 0) {
            query.exists(rect => {
              var ok = true; var i = 0
              while (ok && i < nKey) { ok = rect(i).contains(cols(i)(r)); i += 1 }
              ok
            })
          } else {
            frontier.contains(Vector.tabulate(nKey)(i => cols(i)(r)))
          }
        if (keyMatch) next += Vector.tabulate(nVal)(i => cols(nKey + i)(r))
        r += 1
      }
      frontier = next.result()
    }
    frontier
  }

  /** Expand result rectangles to a cells DataFrame (for oracle checks). */
  def rectsToDf(spark: SparkSession, rects: Seq[Rect], names: Seq[String]): DataFrame = {
    import org.apache.spark.sql.Row
    import org.apache.spark.sql.types.{LongType, StructField, StructType}
    val rows = ThetaJoin.cellSet(rects).toSeq.map(c => Row.fromSeq(c))
    val schema = StructType(names.map(n => StructField(n, LongType, nullable = false)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 4), schema)
  }
}
