package repro.arrays

/** The numpy-operation catalog used by the coverage evaluation (paper
  * Section VII-E, Table IX): 75 element-wise operations and 61 complex
  * operations, matching the paper's counts. Every operation computes its
  * output AND captures its exact cell-level lineage (one [[LocalRel]] per
  * input array) — the Scala equivalent of the paper's `tracked_cell`
  * taint-tracking capture.
  */
trait ArrayOp {
  def name: String
  def category: String // "element" | "complex"
  def arity: Int = 1

  /** Lineage depends on cell values (sort & friends), not just shapes. */
  def valueDependent: Boolean = false

  /** Input shapes for size-variant `k` — extents are chosen distinct so
    * index reshaping is unambiguous.
    */
  def shapes(k: Int): Seq[Vector[Int]]

  /** Scalar arguments as part of the operation signature (op_args). */
  def argsKey: String = ""

  def apply(ins: Seq[NDArray]): NDArray

  /** Exact contribution lineage, one relation per input array, rows in
    * backward orientation (output coords first).
    */
  def lineage(ins: Seq[NDArray]): Seq[LocalRel]

  /** Inputs for run variant `k` (ops needing special values override). */
  def makeInputs(k: Int, seed: Long): Seq[NDArray] =
    shapes(k).zipWithIndex.map { case (s, i) => NDArray.random(s, seed + i) }
}

object Ops {

  // ------------------------------------------------------------- helpers

  private def identityRel(a: NDArray): LocalRel =
    LocalRel(a.ndim, a.ndim, Vector.tabulate(a.size) { f =>
      val c = a.coords(f).map(_.toLong)
      (c ++ c).toArray
    })

  private def rel(nOut: Int, nIn: Int)(rows: Iterable[(Seq[Int], Seq[Int])]): LocalRel =
    LocalRel.fromPairs(rows, nOut, nIn)

  // -------------------------------------------------------- element ops

  final class UnaryElementOp(val name: String, f: Double => Double) extends ArrayOp {
    val category = "element"
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(11 + k))
    def apply(ins: Seq[NDArray]): NDArray = ins.head.map(f)
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = Seq(identityRel(ins.head))
  }

  final class ScalarElementOp(val name: String, arg: Double, f: (Double, Double) => Double)
      extends ArrayOp {
    val category = "element"
    override def argsKey: String = arg.toString
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(11 + k))
    def apply(ins: Seq[NDArray]): NDArray = ins.head.map(f(_, arg))
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = Seq(identityRel(ins.head))
  }

  final class BinaryElementOp(val name: String, f: (Double, Double) => Double)
      extends ArrayOp {
    val category = "element"
    override val arity = 2
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(11 + k), Vector(11 + k))
    def apply(ins: Seq[NDArray]): NDArray =
      new NDArray(ins.head.shape, ins.head.data.lazyZip(ins(1).data).map(f).toArray)
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
      Seq(identityRel(ins.head), identityRel(ins(1)))
  }

  private val unaryNames: Seq[(String, Double => Double)] = Seq(
    "negative" -> (v => -v),
    "positive" -> (v => v),
    "absolute" -> math.abs,
    "fabs" -> math.abs,
    "rint" -> (v => math.rint(v)),
    "ceil" -> math.ceil,
    "floor" -> math.floor,
    "trunc" -> (v => v.toLong.toDouble),
    "sqrt" -> (v => math.sqrt(math.abs(v))),
    "cbrt" -> math.cbrt,
    "square" -> (v => v * v),
    "exp" -> math.exp,
    "exp2" -> (v => math.pow(2, v)),
    "expm1" -> math.expm1,
    "log" -> (v => math.log(math.abs(v) + 1e-9)),
    "log2" -> (v => math.log(math.abs(v) + 1e-9) / math.log(2)),
    "log10" -> (v => math.log10(math.abs(v) + 1e-9)),
    "log1p" -> (v => math.log1p(math.abs(v))),
    "sin" -> math.sin,
    "cos" -> math.cos,
    "tan" -> math.tan,
    "arcsin" -> (v => math.asin(v % 1)),
    "arccos" -> (v => math.acos(v % 1)),
    "arctan" -> math.atan,
    "sinh" -> math.sinh,
    "cosh" -> math.cosh,
    "tanh" -> math.tanh,
    "arcsinh" -> (v => math.log(v + math.sqrt(v * v + 1))),
    "arccosh" -> (v => math.log(math.abs(v) + 1 + math.sqrt(math.abs(v) * (math.abs(v) + 2)))),
    "arctanh" -> (v => 0.5 * math.log((1 + v % 1) / (1 - v % 1 + 1e-9))),
    "deg2rad" -> math.toRadians,
    "rad2deg" -> math.toDegrees,
    "degrees" -> math.toDegrees,
    "radians" -> math.toRadians,
    "reciprocal" -> (v => 1.0 / (v + 1e-9)),
    "sign" -> (v => math.signum(v)),
    "conjugate" -> (v => v),
    "spacing" -> (v => math.ulp(v)),
    "nan_to_num" -> (v => if (v.isNaN) 0.0 else v),
    "real" -> (v => v),
    "fix" -> (v => if (v >= 0) math.floor(v) else math.ceil(v)),
    "sinc" -> (v => if (v == 0) 1.0 else math.sin(math.Pi * v) / (math.Pi * v)),
    "i0" -> (v => 1.0 + (v * v) / 4.0),
    "angle" -> (v => if (v >= 0) 0.0 else math.Pi),
    "signbit" -> (v => if (v < 0) 1.0 else 0.0),
  )

  private val scalarNames: Seq[(String, Double, (Double, Double) => Double)] = Seq(
    ("add_scalar", 2.5, _ + _),
    ("subtract_scalar", 2.5, _ - _),
    ("multiply_scalar", 2.5, _ * _),
    ("divide_scalar", 2.5, _ / _),
    ("power_scalar", 2.0, (v, a) => math.pow(math.abs(v), a)),
    ("mod_scalar", 3.0, (v, a) => v % a),
    ("floor_divide_scalar", 3.0, (v, a) => math.floor(v / a)),
    ("clip", 1.0, (v, a) => math.max(-a, math.min(a, v))),
    ("round_", 0.0, (v, _) => math.rint(v)),
    ("around", 0.0, (v, _) => math.rint(v)),
    ("heaviside_scalar", 0.5, (v, a) => if (v < 0) 0 else if (v == 0) a else 1),
    ("nextafter_scalar", 1.0, (v, a) => math.nextAfter(v, a)),
  )

  private val binaryNames: Seq[(String, (Double, Double) => Double)] = Seq(
    "add" -> (_ + _),
    "subtract" -> (_ - _),
    "multiply" -> (_ * _),
    "divide" -> ((a, b) => a / (b + 1e-9)),
    "true_divide" -> ((a, b) => a / (b + 1e-9)),
    "floor_divide" -> ((a, b) => math.floor(a / (b + 1e-9))),
    "power" -> ((a, b) => math.pow(math.abs(a), math.rint(b % 3))),
    "mod" -> ((a, b) => a % (math.abs(b) + 1e-9)),
    "fmod" -> ((a, b) => math.IEEEremainder(a, math.abs(b) + 1e-9)),
    "remainder" -> ((a, b) => a % (math.abs(b) + 1e-9)),
    "maximum" -> math.max,
    "minimum" -> math.min,
    "fmax" -> math.max,
    "fmin" -> math.min,
    "hypot" -> math.hypot,
    "arctan2" -> math.atan2,
    "copysign" -> ((a, b) => math.copySign(a, b)),
    "logaddexp" -> ((a, b) => math.log(math.exp(a) + math.exp(b))),
  )

  val elementOps: Seq[ArrayOp] =
    unaryNames.map { case (n, f) => new UnaryElementOp(n, f) } ++
      scalarNames.map { case (n, a, f) => new ScalarElementOp(n, a, f) } ++
      binaryNames.map { case (n, f) => new BinaryElementOp(n, f) }

  // -------------------------------------------------------- complex ops

  /** Full reduction to a single cell — every input cell contributes. */
  final class ReduceOp(val name: String, override val arity: Int, agg: Array[Double] => Double)
      extends ArrayOp {
    val category = "complex"
    def shapes(k: Int): Seq[Vector[Int]] = Seq.fill(arity)(Vector(11 + k))
    def apply(ins: Seq[NDArray]): NDArray =
      NDArray.of(agg(ins.flatMap(_.data.toSeq).toArray))
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
      ins.map(a => rel(1, 1)((0 until a.size).map(i => (Seq(0), Seq(i)))))
  }

  private def sum(a: Array[Double]) = a.sum
  private def mean(a: Array[Double]) = a.sum / a.length
  private def variance(a: Array[Double]) = { val m = mean(a); a.map(v => (v - m) * (v - m)).sum / a.length }

  private val reduceOps: Seq[ArrayOp] = Seq(
    new ReduceOp("sum", 1, sum),
    new ReduceOp("prod", 1, _.product),
    new ReduceOp("mean", 1, mean),
    new ReduceOp("min", 1, _.min),
    new ReduceOp("max", 1, _.max),
    new ReduceOp("std", 1, a => math.sqrt(variance(a))),
    new ReduceOp("var", 1, variance),
    new ReduceOp("ptp", 1, a => a.max - a.min),
    new ReduceOp("nansum", 1, a => sum(a.filterNot(_.isNaN))),
    new ReduceOp("nanprod", 1, a => a.filterNot(_.isNaN).product),
    new ReduceOp("nanmean", 1, a => mean(a.filterNot(_.isNaN))),
    new ReduceOp("nanmin", 1, a => a.filterNot(_.isNaN).min),
    new ReduceOp("nanmax", 1, a => a.filterNot(_.isNaN).max),
    new ReduceOp("nanstd", 1, a => math.sqrt(variance(a.filterNot(_.isNaN)))),
    new ReduceOp("nanvar", 1, a => variance(a.filterNot(_.isNaN))),
    new ReduceOp("trapz", 1, a => a.sliding(2).map(p => (p(0) + p(1)) / 2).sum),
    new ReduceOp("vdot", 2, a => { val n = a.length / 2; (0 until n).map(i => a(i) * a(n + i)).sum }),
    new ReduceOp("inner", 2, a => { val n = a.length / 2; (0 until n).map(i => a(i) * a(n + i)).sum }),
  )

  /** 1-D prefix scans: out i <- in [0..i]. */
  final class CumOp(val name: String, step: (Double, Double) => Double) extends ArrayOp {
    val category = "complex"
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(9 + k))
    def apply(ins: Seq[NDArray]): NDArray =
      new NDArray(ins.head.shape, ins.head.data.scanLeft(Double.NaN)(
        (acc, v) => if (acc.isNaN) v else step(acc, v)).tail)
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
      Seq(rel(1, 1)(for (i <- 0 until ins.head.size; j <- 0 to i) yield (Seq(i), Seq(j))))
  }

  private val cumOps: Seq[ArrayOp] = Seq(
    new CumOp("cumsum", _ + _),
    new CumOp("cumprod", _ * _),
    new CumOp("nancumsum", _ + _),
    new CumOp("nancumprod", _ * _),
  )

  /** Local-window 1-D stencils. */
  final class StencilOp(val name: String, window: Int => Seq[Int], outLen: Int => Int,
                        compute: Array[Double] => Array[Double]) extends ArrayOp {
    val category = "complex"
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(10 + k))
    def apply(ins: Seq[NDArray]): NDArray =
      new NDArray(Vector(outLen(ins.head.size)), compute(ins.head.data))
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val n = ins.head.size
      Seq(rel(1, 1)(for {
        i <- 0 until outLen(n)
        j <- window(i) if j >= 0 && j < n
      } yield (Seq(i), Seq(j))))
    }
  }

  private val stencilOps: Seq[ArrayOp] = Seq(
    new StencilOp("diff", i => Seq(i, i + 1), _ - 1,
      a => a.sliding(2).map(p => p(1) - p(0)).toArray),
    new StencilOp("ediff1d", i => Seq(i, i + 1), _ - 1,
      a => a.sliding(2).map(p => p(1) - p(0)).toArray),
    new StencilOp("gradient", i => Seq(i - 1, i, i + 1), identity,
      a => a.indices.map { i =>
        val lo = math.max(0, i - 1); val hi = math.min(a.length - 1, i + 1)
        (a(hi) - a(lo)) / (hi - lo).toDouble.max(1.0)
      }.toArray),
  )

  /** 2-D matrix product C = A @ B. */
  final class MatmulOp(val name: String) extends ArrayOp {
    val category = "complex"
    override val arity = 2
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(4 + k, 6 + k), Vector(6 + k, 8 + k))
    def apply(ins: Seq[NDArray]): NDArray = {
      val Seq(a, b) = ins.take(2)
      val (m, n, p) = (a.shape(0), a.shape(1), b.shape(1))
      NDArray.fill(Vector(m, p)) { f =>
        val i = f / p; val j = f % p
        (0 until n).map(x => a(i, x) * b(x, j)).sum
      }
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val Seq(a, b) = ins.take(2)
      val (m, n, p) = (a.shape(0), a.shape(1), b.shape(1))
      Seq(
        rel(2, 2)(for (i <- 0 until m; j <- 0 until p; x <- 0 until n) yield (Seq(i, j), Seq(i, x))),
        rel(2, 2)(for (i <- 0 until m; j <- 0 until p; x <- 0 until n) yield (Seq(i, j), Seq(x, j))),
      )
    }
  }

  private object OuterOp extends ArrayOp {
    val name = "outer"; val category = "complex"; override val arity = 2
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(5 + k), Vector(7 + k))
    def apply(ins: Seq[NDArray]): NDArray = {
      val (a, b) = (ins.head, ins(1))
      NDArray.fill(Vector(a.size, b.size))(f => a.data(f / b.size) * b.data(f % b.size))
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val (m, n) = (ins.head.size, ins(1).size)
      Seq(
        rel(2, 1)(for (i <- 0 until m; j <- 0 until n) yield (Seq(i, j), Seq(i))),
        rel(2, 1)(for (i <- 0 until m; j <- 0 until n) yield (Seq(i, j), Seq(j))),
      )
    }
  }

  private object KronOp extends ArrayOp {
    val name = "kron"; val category = "complex"; override val arity = 2
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(3 + k, 4 + k), Vector(2, 3))
    def apply(ins: Seq[NDArray]): NDArray = {
      val (a, b) = (ins.head, ins(1))
      val (m, n) = (a.shape(0), a.shape(1)); val (p, q) = (b.shape(0), b.shape(1))
      NDArray.fill(Vector(m * p, n * q)) { f =>
        val i = f / (n * q); val j = f % (n * q)
        a(i / p, j / q) * b(i % p, j % q)
      }
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val (a, b) = (ins.head, ins(1))
      val (m, n) = (a.shape(0), a.shape(1)); val (p, q) = (b.shape(0), b.shape(1))
      val cells = for (i <- 0 until m * p; j <- 0 until n * q) yield (i, j)
      Seq(
        rel(2, 2)(cells.map { case (i, j) => (Seq(i, j), Seq(i / p, j / q)) }),
        rel(2, 2)(cells.map { case (i, j) => (Seq(i, j), Seq(i % p, j % q)) }),
      )
    }
  }

  /** `numpy.cross` — the paper's one reuse-misprediction case: the lineage
    * pattern differs between 3-vectors and 2-vectors (where the result is a
    * scalar z-component per row).
    */
  private object CrossOp extends ArrayOp {
    val name = "cross"; val category = "complex"; override val arity = 2
    def shapes(k: Int): Seq[Vector[Int]] =
      if (k < 15) Seq(Vector(4 + k, 3), Vector(4 + k, 3))
      else Seq(Vector(4 + k, 2), Vector(4 + k, 2))
    def apply(ins: Seq[NDArray]): NDArray = {
      val (a, b) = (ins.head, ins(1))
      val rows = a.shape(0)
      if (a.shape(1) == 3)
        NDArray.fill(Vector(rows, 3)) { f =>
          val i = f / 3
          f % 3 match {
            case 0 => a(i, 1) * b(i, 2) - a(i, 2) * b(i, 1)
            case 1 => a(i, 2) * b(i, 0) - a(i, 0) * b(i, 2)
            case _ => a(i, 0) * b(i, 1) - a(i, 1) * b(i, 0)
          }
        }
      else
        NDArray.fill(Vector(rows))(i => ins.head(i, 0) * b(i, 1) - a(i, 1) * b(i, 0))
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val rows = ins.head.shape(0)
      if (ins.head.shape(1) == 3) {
        def side = rel(2, 2)(for {
          i <- 0 until rows; c <- 0 until 3; s <- 0 until 3 if s != c
        } yield (Seq(i, c), Seq(i, s)))
        Seq(side, side)
      } else {
        def side = rel(1, 2)(for (i <- 0 until rows; s <- 0 until 2) yield (Seq(i), Seq(i, s)))
        Seq(side, side)
      }
    }
  }

  /** Coordinate permutations / reindexings of a 2-D array. */
  final class Map2dOp(val name: String, outShape: (Int, Int) => Vector[Int],
                      src: (Int, Int, Int, Int) => (Int, Int)) extends ArrayOp {
    val category = "complex"
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(5 + k, 8 + k))
    def apply(ins: Seq[NDArray]): NDArray = {
      val a = ins.head
      val (m, n) = (a.shape(0), a.shape(1))
      val os = outShape(m, n)
      NDArray.fill(os) { f =>
        val (i, j) = (f / os(1), f % os(1))
        val (si, sj) = src(m, n, i, j)
        a(si, sj)
      }
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val a = ins.head
      val (m, n) = (a.shape(0), a.shape(1))
      val os = outShape(m, n)
      Seq(rel(2, 2)(for (i <- 0 until os(0); j <- 0 until os(1)) yield {
        val (si, sj) = src(m, n, i, j)
        (Seq(i, j), Seq(si, sj))
      }))
    }
  }

  private val shape2dOps: Seq[ArrayOp] = Seq(
    new Map2dOp("transpose", (m, n) => Vector(n, m), (_, _, i, j) => (j, i)),
    new Map2dOp("swapaxes", (m, n) => Vector(n, m), (_, _, i, j) => (j, i)),
    new Map2dOp("moveaxis", (m, n) => Vector(n, m), (_, _, i, j) => (j, i)),
    new Map2dOp("fliplr", (m, n) => Vector(m, n), (_, n, i, j) => (i, n - 1 - j)),
    new Map2dOp("flipud", (m, n) => Vector(m, n), (m, _, i, j) => (m - 1 - i, j)),
    new Map2dOp("rot90", (m, n) => Vector(n, m), (_, n, i, j) => (j, n - 1 - i)),
    new Map2dOp("reshape", (m, n) => Vector(n, m), (m, n, i, j) => {
      val flat = i * m + j; (flat / n, flat % n)
    }),
  )

  /** 1-D reindexings. */
  final class Map1dOp(val name: String, outLen: Int => Int, src: (Int, Int) => Int,
                      override val argsKey: String = "") extends ArrayOp {
    val category = "complex"
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(9 + k))
    def apply(ins: Seq[NDArray]): NDArray = {
      val a = ins.head
      NDArray.fill(Vector(outLen(a.size)))(i => a.data(src(a.size, i)))
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val n = ins.head.size
      Seq(rel(1, 1)((0 until outLen(n)).map(i => (Seq(i), Seq(src(n, i))))))
    }
  }

  private val map1dOps: Seq[ArrayOp] = Seq(
    new Map1dOp("flip", n => n, (n, i) => n - 1 - i),
    new Map1dOp("roll", n => n, (n, i) => (((i - 2) % n) + n) % n, argsKey = "2"),
    new Map1dOp("tile", n => 3 * n, (n, i) => i % n, argsKey = "3"),
    new Map1dOp("repeat", n => 2 * n, (_, i) => i / 2, argsKey = "2"),
  )

  /** Shape-only reinterpretations between 1-D and 2-D. */
  private val reshapeLikeOps: Seq[ArrayOp] = Seq(
    new ArrayOp {
      val name = "ravel"; val category = "complex"
      def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(4 + k, 6 + k))
      def apply(ins: Seq[NDArray]): NDArray = ins.head.reshape(Vector(ins.head.size))
      def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
        val n = ins.head.shape(1)
        Seq(rel(1, 2)((0 until ins.head.size).map(f => (Seq(f), Seq(f / n, f % n)))))
      }
    },
    new ArrayOp {
      val name = "flatten"; val category = "complex"
      def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(4 + k, 6 + k))
      def apply(ins: Seq[NDArray]): NDArray = ins.head.reshape(Vector(ins.head.size))
      def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
        val n = ins.head.shape(1)
        Seq(rel(1, 2)((0 until ins.head.size).map(f => (Seq(f), Seq(f / n, f % n)))))
      }
    },
    new ArrayOp {
      val name = "squeeze"; val category = "complex"
      def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(1, 9 + k))
      def apply(ins: Seq[NDArray]): NDArray = ins.head.reshape(Vector(ins.head.size))
      def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
        Seq(rel(1, 2)((0 until ins.head.size).map(i => (Seq(i), Seq(0, i)))))
    },
    new ArrayOp {
      val name = "expand_dims"; val category = "complex"
      def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(9 + k))
      def apply(ins: Seq[NDArray]): NDArray = ins.head.reshape(Vector(1, ins.head.size))
      def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
        Seq(rel(2, 1)((0 until ins.head.size).map(i => (Seq(0, i), Seq(i)))))
    },
    new ArrayOp {
      val name = "atleast_2d"; val category = "complex"
      def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(9 + k))
      def apply(ins: Seq[NDArray]): NDArray = ins.head.reshape(Vector(1, ins.head.size))
      def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
        Seq(rel(2, 1)((0 until ins.head.size).map(i => (Seq(0, i), Seq(i)))))
    },
    new ArrayOp {
      val name = "broadcast_to"; val category = "complex"
      override val argsKey = "3"
      def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(9 + k))
      def apply(ins: Seq[NDArray]): NDArray = {
        val a = ins.head
        NDArray.fill(Vector(3, a.size))(f => a.data(f % a.size))
      }
      def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
        Seq(rel(2, 1)(for (r <- 0 until 3; i <- 0 until ins.head.size) yield (Seq(r, i), Seq(i))))
    },
  )

  /** 1-D full-mode convolution/correlation of two arrays. */
  final class ConvOp(val name: String, flipKernel: Boolean) extends ArrayOp {
    val category = "complex"
    override val arity = 2
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(10 + k), Vector(4))
    def apply(ins: Seq[NDArray]): NDArray = {
      val (a, b0) = (ins.head.data, ins(1).data)
      val b = if (flipKernel) b0.reverse else b0
      val out = new Array[Double](a.length + b.length - 1)
      for (i <- a.indices; j <- b.indices) out(i + j) += a(i) * b(j)
      new NDArray(Vector(out.length), out)
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val n = ins.head.size; val m = ins(1).size
      val outs = 0 until (n + m - 1)
      Seq(
        rel(1, 1)(for (o <- outs; i <- math.max(0, o - m + 1) to math.min(o, n - 1))
          yield (Seq(o), Seq(i))),
        rel(1, 1)(for (o <- outs; j <- math.max(0, o - n + 1) to math.min(o, m - 1))
          yield (Seq(o), Seq(j))),
      )
    }
  }

  // ------------------------------------------------- value-dependent ops

  /** Sorting-family ops: lineage is the (value-dependent) permutation. */
  final class PermOp(val name: String) extends ArrayOp {
    val category = "complex"
    override val valueDependent = true
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(11 + k))
    private def perm(a: NDArray): Array[Int] =
      a.data.zipWithIndex.sortBy(_._1).map(_._2)
    def apply(ins: Seq[NDArray]): NDArray =
      new NDArray(ins.head.shape, ins.head.data.sorted)
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
      Seq(rel(1, 1)(perm(ins.head).zipWithIndex.map { case (orig, rank) => (Seq(rank), Seq(orig)) }))
  }

  /** Selection ops (median / percentile / quantile): the selected source
    * cell(s) contribute.
    */
  final class SelectOp(val name: String, q: Double) extends ArrayOp {
    val category = "complex"
    override val valueDependent = true
    override def argsKey: String = q.toString
    // Large enough that two random draws picking the same source index (a
    // coincidental m=1 confirmation) is out of the noise — the paper's
    // arrays are far larger still.
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(211 + k))
    private def picks(a: NDArray): Seq[Int] = {
      val idx = a.data.zipWithIndex.sortBy(_._1).map(_._2)
      val pos = q * (a.size - 1)
      Seq(idx(math.floor(pos).toInt), idx(math.ceil(pos).toInt)).distinct
    }
    def apply(ins: Seq[NDArray]): NDArray = {
      val sorted = ins.head.data.sorted
      val pos = q * (ins.head.size - 1)
      val (lo, hi) = (math.floor(pos).toInt, math.ceil(pos).toInt)
      val frac = pos - lo
      NDArray.of(sorted(lo) * (1 - frac) + sorted(hi) * frac)
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] =
      Seq(rel(1, 1)(picks(ins.head).map(i => (Seq(0), Seq(i)))))
  }

  private object UniqueOp extends ArrayOp {
    val name = "unique"; val category = "complex"
    override val valueDependent = true
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(11 + k))
    def apply(ins: Seq[NDArray]): NDArray = {
      val d = ins.head.data.distinct.sorted
      new NDArray(Vector(d.length), d)
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val d = ins.head.data.distinct.sorted.zipWithIndex.toMap
      Seq(rel(1, 1)(ins.head.data.zipWithIndex.map { case (v, i) => (Seq(d(v)), Seq(i)) }))
    }
  }

  private object TrimZerosOp extends ArrayOp {
    val name = "trim_zeros"; val category = "complex"
    override val valueDependent = true
    def shapes(k: Int): Seq[Vector[Int]] = Seq(Vector(11 + k))
    override def makeInputs(k: Int, seed: Long): Seq[NDArray] = {
      val a = NDArray.random(shapes(k).head, seed)
      val lead = (seed % 4).toInt.abs
      (0 until lead).foreach(i => a.data(i) = 0.0)
      Seq(a)
    }
    private def bounds(a: NDArray): (Int, Int) = {
      val lo = a.data.indexWhere(_ != 0.0) match { case -1 => a.size; case i => i }
      val hi = a.data.lastIndexWhere(_ != 0.0)
      (lo, hi)
    }
    def apply(ins: Seq[NDArray]): NDArray = {
      val (lo, hi) = bounds(ins.head)
      new NDArray(Vector(math.max(0, hi - lo + 1)), ins.head.data.slice(lo, hi + 1))
    }
    def lineage(ins: Seq[NDArray]): Seq[LocalRel] = {
      val (lo, hi) = bounds(ins.head)
      Seq(rel(1, 1)((lo to hi).map(i => (Seq(i - lo), Seq(i)))))
    }
  }

  val complexOps: Seq[ArrayOp] =
    reduceOps ++ cumOps ++ stencilOps ++
      Seq(new MatmulOp("matmul"), new MatmulOp("dot"), new MatmulOp("tensordot"),
          OuterOp, KronOp, CrossOp) ++
      shape2dOps ++ map1dOps ++ reshapeLikeOps ++
      Seq(new ConvOp("convolve", flipKernel = false),
          new ConvOp("correlate", flipKernel = true)) ++
      Seq(new PermOp("sort"), new PermOp("msort"), new PermOp("partition"),
          UniqueOp, TrimZerosOp,
          new SelectOp("median", 0.5), new SelectOp("percentile", 0.3),
          new SelectOp("quantile", 0.7), new SelectOp("nanmedian", 0.5),
          new SelectOp("nanpercentile", 0.3), new SelectOp("nanquantile", 0.7))

  /** The full evaluated catalog — 75 element + 61 complex = 136, matching
    * Table IX's population.
    */
  val all: Seq[ArrayOp] = elementOps ++ complexOps

  /** Ops usable in random 1-D float pipelines (intake and output a single
    * float64 array, tractable lineage size) — the pool behind the paper's
    * random numpy workflows (Fig 9).
    */
  val pipelinePool: Seq[ArrayOp] =
    elementOps.filter(_.arity == 1) ++
      map1dOps ++ Seq(new PermOp("sort"),
        stencilOps.head, stencilOps(2), TrimZerosOp)
}
