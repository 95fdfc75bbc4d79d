package repro.arrays

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.util.Random

/** Synthetic explainable-AI lineage capture (paper §VII-A.2).
  *
  * The paper runs LIME and D-RISE over YOLOv4 on a VIRAT frame and keeps
  * the significant pixel→detection contributions. We have neither the model
  * nor the dataset, so we synthesize the same *shape* of lineage:
  *
  *  - LIME explains via superpixels → contributions arrive as a union of
  *    contiguous image segments (axis-aligned rectangles here) per output
  *    cell: partially structured, compresses well under ProvRC.
  *  - D-RISE explains via random masks → thresholded saliency yields
  *    blob-shaped regions: smaller, more scattered rectangles.
  *
  * Both return a backward-oriented relation (b1 = output cell, a1/a2 =
  * pixel coordinates). Being seeded, the substitution preserves the
  * partially-structured compression behaviour Table VII reports.
  */
object Explain {

  private def rectsToDf(
      spark: SparkSession,
      rects: Seq[(Int, Int, Int, Int, Int)], // (out, iLo, iHi, jLo, jHi)
  ): DataFrame = {
    import spark.implicits._
    rects.toDF("o", "ilo", "ihi", "jlo", "jhi")
      .withColumn("a1", explode(sequence(col("ilo"), col("ihi"))))
      .withColumn("a2", explode(sequence(col("jlo"), col("jhi"))))
      .select(col("o").cast("long").as("b1"), col("a1").cast("long"), col("a2").cast("long"))
      .distinct()
  }

  /** LIME-like capture: each output cell receives `segs` random superpixels
    * from a `grid x grid` segmentation of an `h x w` image.
    */
  def lime(
      spark: SparkSession, h: Int, w: Int, outCells: Int,
      grid: Int = 8, segs: Int = 12, seed: Long = 0,
  ): DataFrame = {
    val rng = new Random(seed)
    val segH = h / grid; val segW = w / grid
    val rects = for {
      o <- 0 until outCells
      s <- rng.shuffle((0 until grid * grid).toList).take(segs)
    } yield {
      val gi = s / grid; val gj = s % grid
      (o, gi * segH, math.min(h, (gi + 1) * segH) - 1,
          gj * segW, math.min(w, (gj + 1) * segW) - 1)
    }
    rectsToDf(spark, rects)
  }

  /** D-RISE-like capture: thresholded random-mask saliency — `blobs` small
    * square regions with jittered radii per output cell.
    */
  def drise(
      spark: SparkSession, h: Int, w: Int, outCells: Int,
      blobs: Int = 40, maxRadius: Int = 6, seed: Long = 1,
  ): DataFrame = {
    val rng = new Random(seed)
    val rects = for {
      o <- 0 until outCells
      _ <- 0 until blobs
    } yield {
      val ci = rng.nextInt(h); val cj = rng.nextInt(w)
      val r = 1 + rng.nextInt(maxRadius)
      (o, math.max(0, ci - r), math.min(h - 1, ci + r),
          math.max(0, cj - r), math.min(w - 1, cj + r))
    }
    rectsToDf(spark, rects)
  }
}
