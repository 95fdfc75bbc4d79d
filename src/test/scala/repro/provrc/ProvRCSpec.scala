package repro.provrc

import org.scalatest.funsuite.AnyFunSuite

/** Known-pattern compression results + lossless roundtrips for ProvRC. */
class ProvRCSpec extends AnyFunSuite {

  private def rel(rows: Seq[Seq[Long]]): Iterator[Array[Long]] =
    rows.iterator.map(_.toArray)

  private def roundtrip(rows: Seq[Seq[Long]], nOut: Int, nIn: Int): Vector[CRow] = {
    val c = ProvRC.compress(rel(rows), nOut, nIn)
    val back = ProvRC.decompress(c).map(_.toSeq).toSet
    assert(back == rows.map(_.toSeq).toSet, "decompress(compress(R)) != R")
    c
  }

  // --- paper running example: B = sum(A, axis=1) over a 3x2 array (Fig 1) ---

  private val sumAxis1_3x2: Seq[Seq[Long]] =
    for (i <- 0L until 3L; k <- 0L until 2L) yield Seq(i, i, k)

  test("aggregate over axis 1 of a 3x2 array compresses to a single row (paper Tables I-II)") {
    val c = roundtrip(sumAxis1_3x2, nOut = 1, nIn = 2)
    assert(c.size == 1)
    val row = c.head
    assert(row.out == Vector(Interval(0, 2)))
    assert(row.in(0) == RelEnc(0, Interval(0, 0))) // a1 = b1 (delta 0)
    assert(row.in(1) == AbsEnc(Interval(0, 1)))    // a2 = full second axis
  }

  test("all-to-all 4x4 -> 1 aggregation compresses to a single absolute row (paper Fig 2)") {
    val rows = for (i <- 0L until 4L; j <- 0L until 4L) yield Seq(0L, i, j)
    val c = roundtrip(rows, nOut = 1, nIn = 2)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, 0)))
    assert(c.head.in == Vector(AbsEnc(Interval(0, 3)), AbsEnc(Interval(0, 3))))
  }

  test("1-D elementwise (one-to-one) compresses to a single relative row (paper Fig 3)") {
    val rows = (0L until 100L).map(i => Seq(i, i))
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, 99)))
    assert(c.head.in == Vector(RelEnc(0, Interval(0, 0))))
  }

  test("2-D elementwise compresses to a single row with per-axis deltas") {
    val rows = for (i <- 0L until 8L; j <- 0L until 5L) yield Seq(i, j, i, j)
    val c = roundtrip(rows, nOut = 2, nIn = 2)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, 7), Interval(0, 4)))
    assert(c.head.in(0) == RelEnc(0, Interval(0, 0)))
    assert(c.head.in(1) == RelEnc(1, Interval(0, 0)))
  }

  test("shifted one-to-one (a = b + 3) compresses to one row with delta 3") {
    val rows = (0L until 50L).map(i => Seq(i, i + 3))
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size == 1)
    assert(c.head.in == Vector(RelEnc(0, Interval(3, 3))))
  }

  test("sliding window (interior convolution) compresses to one row with delta interval") {
    // out i <- in [i-1, i+1], interior only
    val rows = for (i <- 1L until 99L; d <- -1L to 1L) yield Seq(i, i + d)
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(1, 98)))
    assert(c.head.in == Vector(RelEnc(0, Interval(-1, 1))))
  }

  test("matmul left-operand lineage compresses to a single row") {
    // C[i,j] <- A[i,k] : rows (i, j, i, k)
    val n = 6L
    val rows = for (i <- 0L until n; j <- 0L until n; k <- 0L until n) yield Seq(i, j, i, k)
    val c = roundtrip(rows, nOut = 2, nIn = 2)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, n - 1), Interval(0, n - 1)))
    assert(c.head.in(0) == RelEnc(0, Interval(0, 0)))
    assert(c.head.in(1) == AbsEnc(Interval(0, n - 1)))
  }

  test("matrix*vector right-operand (all-to-all per output) compresses to one row") {
    // y[i] <- x[k] for all k
    val rows = for (i <- 0L until 20L; k <- 0L until 30L) yield Seq(i, k)
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size == 1)
    assert(c.head.in == Vector(AbsEnc(Interval(0, 29))))
  }

  test("tile/repetition lineage compresses to one row per repetition block") {
    val n = 50L
    val rows = for (r <- 0L until 4L; i <- 0L until n) yield Seq(r * n + i, i)
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size == 4)
  }

  test("transpose compresses to one row with cross-axis deltas") {
    val rows = for (i <- 0L until 7L; j <- 0L until 4L) yield Seq(j, i, i, j)
    val c = roundtrip(rows, nOut = 2, nIn = 2)
    assert(c.size == 1)
    assert(c.head.in(0) == RelEnc(1, Interval(0, 0)))
    assert(c.head.in(1) == RelEnc(0, Interval(0, 0)))
  }

  test("worst case: odd/even interleave permutation does not range-compress") {
    // a = (2b) mod n — no contiguous runs, no constant deltas of length > 1
    val n = 16L
    val rows = (0L until n).map(b => Seq(b, (2 * b) % n))
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size > n / 2, s"expected near-zero compression, got ${c.size} rows")
  }

  test("reverse permutation compresses only via per-point rows (no pattern match)") {
    val n = 10L
    val rows = (0L until n).map(b => Seq(b, n - 1 - b))
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    // Reversal is neither absolute-constant nor delta-constant; stays n rows.
    assert(c.size == n)
  }

  test("two parallel diagonals compress to one row each or better") {
    val rows = (0L until 30L).flatMap(i => Seq(Seq(i, i), Seq(i, i + 10)))
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size <= 2)
  }

  test("duplicate-free union of rect blocks stays lossless") {
    val rows = ((for (b <- 0L until 3L; a <- 0L until 4L) yield Seq(b, a)) ++
      (for (b <- 10L until 12L; a <- 7L until 9L) yield Seq(b, a))).distinct
    val c = roundtrip(rows, nOut = 1, nIn = 1)
    assert(c.size <= 4)
  }

  test("empty relation compresses to empty table") {
    assert(ProvRC.compress(Iterator.empty, 2, 2).isEmpty)
  }

  test("single tuple compresses to a single row") {
    val c = ProvRC.compress(Iterator(Array(3L, 4L, 5L)), 1, 2)
    assert(c.size == 1)
    assert(ProvRC.decompress(c).toSeq.map(_.toSeq) == Seq(Seq(3L, 4L, 5L)))
  }

  test("remerge of split compressed halves recovers the single-row optimum") {
    val rows = (0L until 100L).map(i => Seq(i, i))
    val first = ProvRC.compress(rel(rows.take(50)), 1, 1)
    val second = ProvRC.compress(rel(rows.drop(50)), 1, 1)
    val merged = ProvRC.remerge(first ++ second, 1, 1)
    assert(merged.size == 1)
    assert(ProvRC.decompress(merged).map(_.toSeq).toSet == rows.map(_.toSeq).toSet)
  }

  test("remerge joins boundary-split aggregate rows") {
    val parts = sumAxis1_3x2.grouped(2).toSeq
    val compressed = parts.flatMap(p => ProvRC.compress(rel(p), 1, 2)).toVector
    val merged = ProvRC.remerge(compressed, 1, 2)
    assert(merged.size == 1)
  }

  test("relation with no input axes compresses output points into ranges") {
    val rows = (0L until 5L).map(i => Seq(i))
    val c = ProvRC.compress(rel(rows), 1, 0)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, 4)))
  }
}
