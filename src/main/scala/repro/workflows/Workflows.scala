package repro.workflows

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.{LongType, StructField, StructType}
import repro.arrays._
import scala.util.Random

/** One lineage-producing step of a workflow: the relation is in backward
  * orientation (to-array axis columns first).
  */
final case class Step(from: String, to: String, relation: DataFrame)

/** A linear workflow over tracked arrays (paper Table VIII / Fig 8-9). */
final case class Pipeline(
    name: String,
    arrays: Seq[(String, Seq[Long])],
    steps: Seq[Step],
) {
  def path: Seq[String] = arrays.map(_._1)
  def firstShape: Seq[Long] = arrays.head._2
}

/** The evaluation workflows: the paper's hand-built image and relational
  * pipelines (Table VIII), a ResNet-block inference trace, and random
  * numpy-style pipelines over a 100k-cell array (Fig 9).
  */
object Workflows {

  /** Materialize a locally captured relation as a Spark DataFrame with the
    * canonical `b1..`/`a1..` column names.
    */
  def relToDf(spark: SparkSession, rel: LocalRel): DataFrame = {
    val names = (1 to rel.nOut).map(i => s"b$i") ++ (1 to rel.nIn).map(i => s"a$i")
    val schema = StructType(names.map(n => StructField(n, LongType, nullable = false)))
    val rows = rel.rows.map(r => Row.fromSeq(r.toSeq))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 8), schema)
  }

  private def cellsRel(
      spark: SparkSession, outRows: Int, outCols: Int,
  )(f: (Int, Int) => Seq[(Int, Int)]): DataFrame = {
    val b = Vector.newBuilder[Array[Long]]
    var r = 0
    while (r < outRows) {
      var c = 0
      while (c < outCols) {
        f(r, c).foreach { case (sr, sc) => b += Array(r.toLong, c.toLong, sr.toLong, sc.toLong) }
        c += 1
      }
      r += 1
    }
    relToDf(spark, LocalRel(2, 2, b.result()))
  }

  // ------------------------------------------------------ image pipeline

  /** Table VIII image workflow: resize → luminosity → rot90 → hflip →
    * LIME-style explanation (5 detection outputs).
    */
  def imagePipeline(spark: SparkSession, src: Int = 256, n: Int = 128): Pipeline = {
    val nl = n.toLong
    val arrays = Seq(
      "img0" -> Seq(src.toLong, src.toLong),
      "img1" -> Seq(nl, nl),
      "img2" -> Seq(nl, nl),
      "img3" -> Seq(nl, nl),
      "img4" -> Seq(nl, nl),
      "det" -> Seq(5L),
    )
    val steps = Seq(
      Step("img0", "img1", LineageGen.resizeNearest(spark, nl, nl, src.toLong, src.toLong)),
      Step("img1", "img2", LineageGen.elementwise(spark, Seq(nl, nl))),
      Step("img2", "img3", LineageGen.rot90(spark, nl)),
      Step("img3", "img4", LineageGen.flipH(spark, nl, nl)),
      Step("img4", "det", Explain.lime(spark, n, n, outCells = 5, grid = 8, segs = 10, seed = 21)),
    )
    Pipeline("image", arrays, steps)
  }

  // ------------------------------------------------- relational pipeline

  /** Table VIII relational workflow: inner join on tconst → drop NaN column
    * → add two columns → one-hot encode genres → add constant. Tables are
    * 2-D arrays in canonical order (rows x columns).
    */
  def relationalPipeline(spark: SparkSession, nBasics: Int = 6000): Pipeline = {
    val lc = 4 // tconst, startYear, isAdult, genres
    val rc = 2 // parentTconst, episodeNumber
    val parents = SynthTables.episodeParents(nBasics, avgEpisodes = 40.0, seed = 31)
    val m = parents.length
    val genreCard = 8
    val rng = new Random(32)
    val genreOfBasics = Array.fill(nBasics)(rng.nextInt(genreCard))
    val genreOfJoined = parents.map(genreOfBasics)

    val keepAfterNaN = Seq(0, 2, 3, 4, 5) // drop startYear (NaN-laden)
    val nKeep = keepAfterNaN.size          // 5
    val nAdd = nKeep + 1                   // 6: appended sum column
    val oneHotBase = nAdd                  // genre indicators appended
    val nOneHot = nAdd + genreCard         // 14

    val arrays = Seq(
      "t0" -> Seq(nBasics.toLong, lc.toLong),
      "joined" -> Seq(m.toLong, (lc + rc).toLong),
      "filtered" -> Seq(m.toLong, nKeep.toLong),
      "added" -> Seq(m.toLong, nAdd.toLong),
      "onehot" -> Seq(m.toLong, nOneHot.toLong),
      "fin" -> Seq(m.toLong, nOneHot.toLong),
    )
    val genreColAfterFilter = 3 // column index of genres in `filtered`

    val steps = Seq(
      Step("t0", "joined", LineageGen.joinSide(spark, parents, lc, colOffset = 0)),
      Step("joined", "filtered",
        cellsRel(spark, m, nKeep)((r, c) => Seq((r, keepAfterNaN(c))))),
      Step("filtered", "added",
        cellsRel(spark, m, nAdd)((r, c) =>
          if (c < nKeep) Seq((r, c)) else Seq((r, 1), (r, 2)))),
      Step("added", "onehot",
        cellsRel(spark, m, nOneHot)((r, c) =>
          if (c < nAdd) Seq((r, c))
          else if (c - oneHotBase == genreOfJoined(r)) Seq((r, genreColAfterFilter))
          else Nil)),
      Step("onehot", "fin", LineageGen.elementwise(spark, Seq(m.toLong, nOneHot.toLong))),
    )
    Pipeline("relational", arrays, steps)
  }

  // ----------------------------------------------------- resnet pipeline

  /** Seven steps of a ResNet block during inference (paper Fig 8C):
    * conv→bn→relu→conv→bn→add-skip→relu over a (c, h, w) tensor.
    */
  def resnetBlock(spark: SparkSession, c: Int = 8, h: Int = 16, w: Int = 16): Pipeline = {
    val shape = Seq(c.toLong, h.toLong, w.toLong)
    val names = (0 to 7).map(i => s"t$i")
    val arrays = names.map(_ -> shape)
    def conv = LineageGen.convChannels(spark, h.toLong, w.toLong, c, c)
    def elem = LineageGen.elementwise(spark, shape)
    val rels = Seq(conv, elem, elem, conv, elem, elem, elem)
    val steps = rels.zipWithIndex.map { case (r, i) => Step(names(i), names(i + 1), r) }
    Pipeline("resnet", arrays, steps)
  }

  // ----------------------------------------------------- random pipeline

  /** A random numpy-style pipeline: `nOps` chained operations drawn from the
    * 1-D float pool, threaded over real values so value-dependent lineage
    * (sort) is exercised (paper Fig 9).
    */
  def randomPipeline(spark: SparkSession, nOps: Int, cells: Int, seed: Long): Pipeline = {
    val rng = new Random(seed)
    var arr = NDArray.random(Vector(cells), seed)
    val arrays = Vector.newBuilder[(String, Seq[Long])]
    arrays += (("x0", Seq(cells.toLong)))
    val steps = Vector.newBuilder[Step]
    var opsUsed = List.empty[String]
    for (i <- 1 to nOps) {
      val pool = Ops.pipelinePool.filter { op =>
        // keep array sizes bounded: no growth ops past 2x the initial size
        !(arr.size > 2 * cells && Seq("tile", "repeat").contains(op.name))
      }
      val op = pool(rng.nextInt(pool.size))
      opsUsed ::= op.name
      val rel = op.lineage(Seq(arr)).head
      arr = op.apply(Seq(arr))
      arrays += ((s"x$i", arr.shape.map(_.toLong)))
      steps += Step(s"x${i - 1}", s"x$i", relToDf(spark, rel))
    }
    Pipeline(s"random-$nOps-$seed [${opsUsed.reverse.mkString(",")}]",
      arrays.result(), steps.result())
  }
}
