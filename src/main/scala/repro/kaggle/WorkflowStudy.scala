package repro.kaggle

import repro.arrays.LocalRel
import repro.provrc.ProvRC
import scala.util.Random

/** Synthetic stand-in for the paper's manual study of 20 Kaggle notebooks
  * (Table X). We cannot redo a manual inspection of the original notebooks,
  * so we simulate it: a seeded corpus of workflow traces is generated with
  * operation mixes modeled on the paper's description (data-exploration
  * notebooks: more ops, more value filters, shorter chains; ML notebooks:
  * fewer ops, more linear-algebra/featurization, longer chains), over
  * Flight-like and Netflix-like table schemas.
  *
  * Crucially the *compressibility* of each operation kind is NOT asserted —
  * it is measured, by compressing a small lineage instance of that kind
  * with the real ProvRC implementation and checking whether the row count
  * collapses (the paper's "matches one of the three patterns" criterion).
  */
object WorkflowStudy {

  /** One operation kind with a generator of a representative small lineage
    * instance.
    */
  final case class OpKind(name: String, sample: Long => LocalRel)

  private def rel1(rows: Iterable[(Int, Int)]): LocalRel =
    LocalRel(1, 1, rows.iterator.map { case (b, a) => Array(b.toLong, a.toLong) }.toVector)

  private val N = 64

  /** Operation kinds seen in tabular data-science workflows. */
  val kinds: Seq[OpKind] = Seq(
    OpKind("fillna", _ => rel1((0 until N).map(i => (i, i)))),
    OpKind("astype", _ => rel1((0 until N).map(i => (i, i)))),
    OpKind("scale", _ => rel1((0 until N).map(i => (i, i)))),
    OpKind("add_columns", _ => rel1((0 until N).map(i => (i, i)))),
    OpKind("rename", _ => rel1((0 until N).map(i => (i, i)))),
    OpKind("datetime_parse", _ => rel1((0 until N).map(i => (i, i)))),
    OpKind("drop_columns", _ => rel1((0 until N).map(i => (i, i + 8)))),
    OpKind("head", _ => rel1((0 until N / 4).map(i => (i, i)))),
    OpKind("aggregate", _ => rel1((0 until N).map(i => (0, i)))),
    OpKind("rolling_mean", _ => rel1(for (i <- 2 until N; j <- i - 2 to i) yield (i, j))),
    OpKind("matmul_fit", _ => rel1(for (i <- 0 until 8; j <- 0 until N) yield (i, j))),
    OpKind("concat_rows", _ => rel1((0 until N).map(i => (i, i % (N / 2))))),
    OpKind("merge_sorted", seed => {
      val rng = new Random(seed)
      var src = 0
      rel1((0 until N).map { i => if (rng.nextDouble() < 0.3) src += 1; (i, math.min(src, N - 1)) })
    }),
    // value filters / reorderings: scattered, incompressible lineage
    OpKind("value_filter", seed => {
      val rng = new Random(seed)
      val kept = (0 until 4 * N).filter(_ => rng.nextDouble() < 0.25).take(N)
      rel1(kept.zipWithIndex.map { case (src, i) => (i, src) })
    }),
    OpKind("sort_values", seed => {
      val rng = new Random(seed)
      rel1(rng.shuffle((0 until N).toList).zipWithIndex.map { case (src, i) => (i, src) })
    }),
    OpKind("drop_duplicates", seed => {
      val rng = new Random(seed)
      val kept = (0 until 4 * N).filter(_ => rng.nextDouble() < 0.25).take(N)
      rel1(kept.zipWithIndex.map { case (src, i) => (i, src) })
    }),
    OpKind("groupby_unsorted", seed => {
      val rng = new Random(seed)
      rel1((0 until N).map(i => (rng.nextInt(8), i))).copy(nOut = 1)
    }),
    OpKind("sample", seed => {
      val rng = new Random(seed)
      rel1(rng.shuffle((0 until N).toList).take(N / 2).zipWithIndex.map { case (s, i) => (i, s) })
    }),
  )

  /** Measured compressibility of an op kind: its sampled lineage collapses
    * to <= half the rows under ProvRC.
    */
  def isCompressible(kind: OpKind, seed: Long): Boolean = {
    val rel = kind.sample(seed)
    val c = ProvRC.compress(rel.rows.iterator, rel.nOut, rel.nIn)
    c.size.toDouble <= 0.5 * rel.rows.size
  }

  final case class Trace(dataset: String, ops: Seq[String], compressible: Int, longestChain: Int)

  /** Generate one notebook trace. Exploration-heavy notebooks draw more
    * value filters/sorts and branch often (short chains); ML-heavy ones
    * chain featurization and model ops.
    */
  def generate(dataset: String, seed: Long): Trace = {
    val rng = new Random(seed)
    val mlShare = dataset match {
      case "flight" => 0.55 // paper: Flight notebooks skew more ML -> higher coverage
      case _        => 0.35
    }
    val isMl = rng.nextDouble() < mlShare
    val nOps = math.max(5,
      (if (isMl) 35 + rng.nextGaussian() * 18 else 70 + rng.nextGaussian() * 32).toInt)
    val exploreKinds = Seq("value_filter", "sort_values", "drop_duplicates",
      "groupby_unsorted", "sample", "head", "aggregate", "fillna", "astype",
      "rename", "datetime_parse", "drop_columns", "add_columns")
    val mlKinds = Seq("fillna", "astype", "scale", "add_columns", "datetime_parse",
      "drop_columns", "aggregate", "rolling_mean", "matmul_fit", "concat_rows",
      "merge_sorted", "value_filter", "sort_values")
    val pool = if (isMl) mlKinds else exploreKinds
    val ops = Seq.fill(nOps)(pool(rng.nextInt(pool.size)))

    val compressible = ops.count { name =>
      isCompressible(kinds.find(_.name == name).get, rng.nextLong())
    }

    // Chain structure: each op either extends the current dataframe chain or
    // starts a new branch (exploration branches far more often).
    val extendP = if (isMl) 0.85 else 0.62
    var cur = 0; var longest = 0
    ops.foreach { _ =>
      if (rng.nextDouble() < extendP) { cur += 1; longest = math.max(longest, cur) }
      else cur = 1
    }
    Trace(dataset, ops, compressible, math.max(longest, 1))
  }

  final case class StudyRow(
      dataset: String, meanOps: Double, sdOps: Double,
      meanCompress: Double, sdCompress: Double,
      meanPct: Double, sdPct: Double,
      meanChain: Double, sdChain: Double,
  )

  private def stats(xs: Seq[Double]): (Double, Double) = {
    val m = xs.sum / xs.size
    (m, math.sqrt(xs.map(x => (x - m) * (x - m)).sum / xs.size))
  }

  /** Run the study: `perDataset` notebooks for each dataset. */
  def study(perDataset: Int = 10, seed: Long = 99): Seq[StudyRow] = {
    val traces = Seq("flight", "netflix").flatMap(d =>
      (0 until perDataset).map(i => generate(d, seed + d.hashCode + i)))
    def row(name: String, ts: Seq[Trace]): StudyRow = {
      val (mo, so) = stats(ts.map(_.ops.size.toDouble))
      val (mc, sc) = stats(ts.map(_.compressible.toDouble))
      val (mp, sp) = stats(ts.map(t => 100.0 * t.compressible / t.ops.size))
      val (mch, sch) = stats(ts.map(_.longestChain.toDouble))
      StudyRow(name, mo, so, mc, sc, mp, sp, mch, sch)
    }
    Seq(
      row("Flight", traces.filter(_.dataset == "flight")),
      row("Netflix", traces.filter(_.dataset == "netflix")),
      row("Total", traces),
    )
  }
}
