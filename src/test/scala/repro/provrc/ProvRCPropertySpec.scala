package repro.provrc

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import org.scalatest.funsuite.AnyFunSuite

/** Property-based losslessness and query-correctness checks: ProvRC must be
  * lossless on *any* relation with set semantics (paper §IV-B), and the
  * in-situ θ-join must agree with brute force on *any* query.
  *
  * Plain ScalaCheck generators are sampled with fixed seeds (the
  * scalatest/scalacheck bridge artifact is not available offline).
  */
class ProvRCPropertySpec extends AnyFunSuite {

  private val Trials = 80

  private def samples[A](g: Gen[A]): Seq[A] =
    (1 to Trials).flatMap(i => g.apply(Gen.Parameters.default, Seed(i.toLong)))

  private val smallRelGen: Gen[(Int, Int, Set[Vector[Long]])] = for {
    nOut <- Gen.choose(1, 2)
    nIn <- Gen.choose(1, 2)
    n <- Gen.choose(0, 40)
    rows <- Gen.listOfN(n, Gen.listOfN(nOut + nIn, Gen.choose(0L, 6L)).map(_.toVector))
  } yield (nOut, nIn, rows.toSet)

  private val structuredGen: Gen[Set[Vector[Long]]] = for {
    nRects <- Gen.choose(1, 4)
    rects <- Gen.listOfN(nRects, for {
      bLo <- Gen.choose(0L, 8L); bLen <- Gen.choose(0L, 4L)
      aLo <- Gen.choose(0L, 8L); aLen <- Gen.choose(0L, 4L)
    } yield (Interval(bLo, bLo + bLen), Interval(aLo, aLo + aLen)))
  } yield rects.flatMap { case (b, a) =>
    for (bv <- b.lo to b.hi; av <- a.lo to a.hi) yield Vector(bv, av)
  }.toSet

  private val diagonalGen: Gen[Set[Vector[Long]]] = for {
    n <- Gen.choose(1, 20)
    delta <- Gen.choose(-5L, 5L)
    width <- Gen.choose(0L, 3L)
  } yield (0L until n.toLong)
    .flatMap(b => (0L to width).map(w => Vector(b, b + delta + w)))
    .toSet

  private def checkLossless(nOut: Int, nIn: Int, rows: Set[Vector[Long]]): Unit = {
    val c = ProvRC.compress(rows.iterator.map(_.toArray), nOut, nIn)
    val back = ProvRC.decompress(c).map(_.toVector).toVector
    assert(back.size == back.distinct.size, s"decompression produced duplicates: $rows")
    assert(back.toSet == rows, s"compression is not lossless: $rows")
    assert(c.size <= math.max(rows.size, 1), "compression increased row count")
  }

  test("lossless on arbitrary small relations") {
    samples(smallRelGen).foreach { case (nOut, nIn, rows) => checkLossless(nOut, nIn, rows) }
  }

  test("lossless on rectangular-structured relations") {
    samples(structuredGen).foreach(rows => checkLossless(1, 1, rows))
  }

  test("lossless on banded/diagonal relations") {
    samples(diagonalGen).foreach(rows => checkLossless(1, 1, rows))
  }

  test("banded relations compress to O(1) rows") {
    samples(diagonalGen).foreach { rows =>
      val c = ProvRC.compress(rows.iterator.map(_.toArray), 1, 1)
      assert(c.size <= 2, s"band of ${rows.size} rows compressed to ${c.size}")
    }
  }

  test("remerge of an arbitrary split is lossless") {
    samples(smallRelGen.flatMap(r => Gen.choose(0, 40).map((r, _)))).foreach {
      case ((nOut, nIn, rows), cut0) if rows.nonEmpty =>
        val seq = rows.toVector.sortBy(_.mkString(","))
        val cut = cut0 % seq.size
        val a = ProvRC.compress(seq.take(cut).iterator.map(_.toArray), nOut, nIn)
        val b = ProvRC.compress(seq.drop(cut).iterator.map(_.toArray), nOut, nIn)
        val merged = ProvRC.remerge(a ++ b, nOut, nIn)
        assert(ProvRC.decompress(merged).map(_.toVector).toSet == rows)
      case _ => ()
    }
  }

  test("theta-join equals brute force for arbitrary relations and queries") {
    val gen = for {
      rel <- smallRelGen
      lo1 <- Gen.choose(0L, 6L); len1 <- Gen.choose(0L, 3L)
      lo2 <- Gen.choose(0L, 6L); len2 <- Gen.choose(0L, 3L)
    } yield (rel, Interval(lo1, lo1 + len1), Interval(lo2, lo2 + len2))

    samples(gen).foreach { case ((nOut, nIn, rows), q1, q2) =>
      val table = ProvRC.compress(rows.iterator.map(_.toArray), nOut, nIn)
      val rect: ThetaJoin.Rect = Vector(q1, q2).take(nOut)
      val res = ThetaJoin.join(table, Seq(rect))
      val cells = ThetaJoin.cellSet(Seq(rect))
      val expected = rows.filter(r => cells.contains(r.take(nOut))).map(_.drop(nOut))
      assert(ThetaJoin.cellSet(res) == expected, s"rows=$rows rect=$rect")
    }
  }

  test("mergeRects preserves covered cell sets") {
    val rectsGen = Gen.listOf(for {
      lo1 <- Gen.choose(0L, 10L); len1 <- Gen.choose(0L, 4L)
      lo2 <- Gen.choose(0L, 10L); len2 <- Gen.choose(0L, 4L)
    } yield Vector(Interval(lo1, lo1 + len1), Interval(lo2, lo2 + len2)))
    samples(rectsGen).foreach { rects =>
      val merged = ThetaJoin.mergeRects(rects.toVector)
      assert(ThetaJoin.cellSet(merged) == ThetaJoin.cellSet(rects))
      assert(merged.size <= math.max(rects.size, 0))
    }
  }

  test("codec roundtrip for arbitrary compressed tables") {
    samples(smallRelGen).foreach { case (nOut, nIn, rows) =>
      val c = ProvRC.compress(rows.iterator.map(_.toArray), nOut, nIn)
      val (decoded, o, i) = Codec.decode(Codec.encode(c, nOut, nIn))
      assert(decoded == c && o == nOut && i == nIn)
    }
  }
}
