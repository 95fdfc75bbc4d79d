package repro.arrays

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType
import scala.util.Random

/** Spark-scale generators of fine-grained lineage relations for the array
  * operations evaluated in the paper (Section VII). Every generator returns
  * a DataFrame in the canonical backward orientation — output-axis columns
  * `b1..bl` first, then input-axis columns `a1..am` — with one distinct row
  * per (output cell, contributing input cell) pair. These stand in for the
  * paper's `tracked_cell` capture at numpy scale.
  */
object LineageGen {

  /** Integral floor division — Spark's `/` on longs yields doubles. */
  private def idiv(a: Column, b: Long): Column = floor(a / b).cast(LongType)

  private def named(cols: Seq[Column], nOut: Int): Seq[Column] = {
    val nIn = cols.size - nOut
    cols.zipWithIndex.map { case (c, i) =>
      val n = if (i < nOut) s"b${i + 1}" else s"a${i - nOut + 1}"
      c.cast(LongType).as(n)
    }
  }

  /** Row-major unravel of a flat id into per-axis coordinates. */
  private def unravel(id: Column, shape: Seq[Long]): Seq[Column] = {
    val strides = shape.scanRight(1L)(_ * _).tail // stride of each axis
    shape.indices.map(i => idiv(id, strides(i)) % shape(i))
  }

  /** One-to-one (elementwise) operation over any shape: `a = b`. */
  def elementwise(spark: SparkSession, shape: Seq[Long]): DataFrame = {
    val total = shape.product
    val df = spark.range(total)
    val coords = unravel(col("id"), shape)
    df.select(named(coords ++ coords, shape.size): _*)
  }

  /** Aggregation of a 2-D array over `axis` (paper Fig 1): every output cell
    * receives the full run of the aggregated axis.
    */
  def aggregate2d(spark: SparkSession, d0: Long, d1: Long, axis: Int): DataFrame = {
    val df = spark.range(d0 * d1)
    val i = idiv(col("id"), d1)
    val k = col("id") % d1
    val cols = axis match {
      case 1 => Seq(i, i, k) // b1 = i ; a = (i, k)
      case 0 => Seq(k, i, k) // b1 = k ; a = (i, k)  (aggregate rows)
      case _ => throw new IllegalArgumentException(s"axis $axis")
    }
    df.select(named(cols, 1): _*)
  }

  /** Full reduction of any shape to a single output cell. */
  def aggregateAll(spark: SparkSession, shape: Seq[Long]): DataFrame = {
    val df = spark.range(shape.product)
    df.select(named(lit(0L) +: unravel(col("id"), shape), 1): _*)
  }

  /** `numpy.tile` of a 1-D array: `a = b mod n`. */
  def tile1d(spark: SparkSession, n: Long, reps: Long): DataFrame =
    spark.range(n * reps).select(named(Seq(col("id"), col("id") % n), 1): _*)

  /** Lineage of `C = A @ B` against the left operand: `C[i,j] <- A[i,k]`. */
  def matmulLeft(spark: SparkSession, n: Long, m: Long, p: Long): DataFrame = {
    val df = spark.range(n * p * m)
    val i = idiv(col("id"), p * m)
    val j = idiv(col("id"), m) % p
    val k = col("id") % m
    df.select(named(Seq(i, j, i, k), 2): _*)
  }

  /** Lineage of `C = A @ B` against the right operand: `C[i,j] <- B[k,j]`. */
  def matmulRight(spark: SparkSession, n: Long, m: Long, p: Long): DataFrame = {
    val df = spark.range(n * p * m)
    val i = idiv(col("id"), p * m)
    val j = idiv(col("id"), m) % p
    val k = col("id") % m
    df.select(named(Seq(i, j, k, j), 2): _*)
  }

  /** Lineage of `y = A @ x` against the matrix: `y[i] <- A[i,k]`. */
  def matvecLeft(spark: SparkSession, n: Long, m: Long): DataFrame = {
    val df = spark.range(n * m)
    df.select(named(Seq(idiv(col("id"), m), idiv(col("id"), m), col("id") % m), 1): _*)
  }

  /** Lineage of `y = A @ x` against the vector: `y[i] <- x[k]` (all k). */
  def matvecRight(spark: SparkSession, n: Long, m: Long): DataFrame = {
    val df = spark.range(n * m)
    df.select(named(Seq(idiv(col("id"), m), col("id") % m), 1): _*)
  }

  /** Same-padding 2-D convolution over an `h x w` image with a `kh x kw`
    * kernel (the paper's ImgFilter): interior cells see the full kernel
    * window, boundary cells a clipped one.
    */
  def conv2dSame(spark: SparkSession, h: Long, w: Long, kh: Int, kw: Int): DataFrame = {
    val rh = (kh - 1) / 2; val rw = (kw - 1) / 2
    val df = spark
      .range(h * w)
      .select(idiv(col("id"), w).as("i"), (col("id") % w).as("j"))
      .withColumn("di", explode(sequence(lit(-rh), lit(rh))))
      .withColumn("dj", explode(sequence(lit(-rw), lit(rw))))
      .filter(col("i") + col("di") >= 0 && col("i") + col("di") < h &&
              col("j") + col("dj") >= 0 && col("j") + col("dj") < w)
    df.select(named(Seq(col("i"), col("j"), col("i") + col("di"), col("j") + col("dj")), 2): _*)
  }

  /** 3x3 same-padding convolution across channels (a ResNet-block conv):
    * output (co, i, j) <- input (ci, i+di, j+dj) for every input channel.
    */
  def convChannels(spark: SparkSession, h: Long, w: Long, cIn: Int, cOut: Int): DataFrame = {
    val df = spark
      .range(cOut * h * w)
      .select(
        idiv(col("id"), h * w).as("co"),
        (idiv(col("id"), w) % h).as("i"),
        (col("id") % w).as("j"),
      )
      .withColumn("ci", explode(sequence(lit(0), lit(cIn - 1))))
      .withColumn("di", explode(sequence(lit(-1), lit(1))))
      .withColumn("dj", explode(sequence(lit(-1), lit(1))))
      .filter(col("i") + col("di") >= 0 && col("i") + col("di") < h &&
              col("j") + col("dj") >= 0 && col("j") + col("dj") < w)
    df.select(named(
      Seq(col("co"), col("i"), col("j"), col("ci"), col("i") + col("di"), col("j") + col("dj")),
      3): _*)
  }

  /** Elementwise op over a channel tensor (ReLU / batch-norm in inference). */
  def elementwise3d(spark: SparkSession, c: Long, h: Long, w: Long): DataFrame =
    elementwise(spark, Seq(c, h, w))

  /** 90-degree rotation of an `h x w` image: out (i, j) <- in (j, h' - ...).
    * Using numpy's rot90 convention: B[i, j] = A[j, w - 1 - i] for an h x w
    * output of a w x h input... we keep the simple square-image form
    * B[i, j] = A[j, n - 1 - i].
    */
  def rot90(spark: SparkSession, n: Long): DataFrame = {
    val df = spark.range(n * n)
    val i = idiv(col("id"), n)
    val j = col("id") % n
    df.select(named(Seq(i, j, j, lit(n - 1) - i), 2): _*)
  }

  /** Horizontal flip of an `h x w` image: B[i, j] = A[i, w - 1 - j]. */
  def flipH(spark: SparkSession, h: Long, w: Long): DataFrame = {
    val df = spark.range(h * w)
    val i = idiv(col("id"), w)
    val j = col("id") % w
    df.select(named(Seq(i, j, i, lit(w - 1) - j), 2): _*)
  }

  /** Nearest-neighbour resize — scaling lineage matches none of ProvRC's
    * patterns (the paper's incompressible image-pipeline step).
    */
  def resizeNearest(
      spark: SparkSession, hOut: Long, wOut: Long, hIn: Long, wIn: Long
  ): DataFrame = {
    val df = spark.range(hOut * wOut)
    val i = idiv(col("id"), wOut)
    val j = col("id") % wOut
    val si = idiv(i * hIn, hOut)
    val sj = idiv(j * wIn, wOut)
    df.select(named(Seq(i, j, si, sj), 2): _*)
  }

  /** Lineage of sorting a 1-D array of i.i.d. random values: a random
    * permutation — the paper's worst case for ProvRC.
    */
  def sortPerm(spark: SparkSession, n: Int, seed: Long): DataFrame = {
    import spark.implicits._
    val rng = new Random(seed)
    val perm = rng.shuffle((0 until n).toVector)
    spark
      .createDataset(perm.zipWithIndex.map { case (orig, rank) => (rank.toLong, orig.toLong) })
      .toDF("b1", "a1")
  }

  /** A value-dependent group-by over an unsorted key column: output cell
    * (group rank, column) <- input cell (row, column). `keys(r)` is the
    * group of row r; groups are ranked by first key order.
    */
  def groupBy(spark: SparkSession, keys: Array[Int], nCols: Int): DataFrame = {
    import spark.implicits._
    val groupRank = keys.distinct.sorted.zipWithIndex.toMap
    val rows = keys.iterator.zipWithIndex.flatMap { case (k, r) =>
      val g = groupRank(k).toLong
      (0 until nCols).iterator.map(c => (g, c.toLong, r.toLong, c.toLong))
    }
    spark.createDataset(rows.toVector).toDF("b1", "b2", "a1", "a2")
  }

  /** Sort-merge inner join lineage against one side: output row r pairs left
    * row `li(r)` with right row `ri(r)`; output columns `[0, nCols)` of that
    * side map one-to-one.
    */
  def joinSide(
      spark: SparkSession, matchRows: Array[Int], nCols: Int, colOffset: Int
  ): DataFrame = {
    import spark.implicits._
    val rows = matchRows.iterator.zipWithIndex.flatMap { case (src, outRow) =>
      (0 until nCols).iterator.map(c =>
        (outRow.toLong, (colOffset + c).toLong, src.toLong, c.toLong))
    }
    spark.createDataset(rows.toVector).toDF("b1", "b2", "a1", "a2")
  }
}
