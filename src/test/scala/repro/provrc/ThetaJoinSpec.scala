package repro.provrc

import org.scalatest.funsuite.AnyFunSuite

class ThetaJoinSpec extends AnyFunSuite {
  import ThetaJoin.Rect

  private def q(ivs: Interval*): Rect = ivs.toVector

  /** Brute-force reference: expand relation, filter by query cells, project. */
  private def reference(
      rows: Seq[Seq[Long]], nOut: Int, query: Seq[Rect]
  ): Set[Vector[Long]] = {
    val cells = ThetaJoin.cellSet(query)
    rows.iterator
      .filter(r => cells.contains(r.take(nOut).toVector))
      .map(r => r.drop(nOut).toVector)
      .toSet
  }

  test("paper running example: backward query b1 in [1,2] over compressed sum-axis table (Tables IV-VI)") {
    // Paper's 1-based example: b1=[1,3], a1 rel delta 0, a2 abs [1,2].
    val table = Vector(
      CRow(Vector(Interval(1, 3)), Vector(RelEnc(0, Interval(0, 0)), AbsEnc(Interval(1, 2))))
    )
    val res = ThetaJoin.join(table, Seq(q(Interval(1, 2))))
    assert(res == Vector(Vector(Interval(1, 2), Interval(1, 2))))
  }

  test("range join drops rows with empty intersection") {
    val table = Vector(
      CRow(Vector(Interval(0, 4)), Vector(AbsEnc(Interval(0, 9)))),
      CRow(Vector(Interval(10, 14)), Vector(AbsEnc(Interval(20, 29)))),
    )
    val res = ThetaJoin.join(table, Seq(q(Interval(2, 3))))
    assert(res == Vector(Vector(Interval(0, 9))))
  }

  test("de-relativize with interval delta uses the Minkowski sum (paper Fig 5)") {
    // a in b + [0,1], b = [1,3]; query b in [1,2] -> a in [1,3]
    val table = Vector(
      CRow(Vector(Interval(1, 3)), Vector(RelEnc(0, Interval(0, 1))))
    )
    val res = ThetaJoin.join(table, Seq(q(Interval(1, 2))))
    assert(res == Vector(Vector(Interval(1, 3))))
  }

  test("query covering nothing yields empty result") {
    val table = Vector(CRow(Vector(Interval(0, 4)), Vector(AbsEnc(Interval(0, 9)))))
    assert(ThetaJoin.join(table, Seq(q(Interval(50, 60)))).isEmpty)
  }

  test("multi-axis intersection must be non-empty on every axis") {
    val table = Vector(
      CRow(Vector(Interval(0, 4), Interval(0, 4)), Vector(AbsEnc(Interval(0, 1))))
    )
    assert(ThetaJoin.join(table, Seq(q(Interval(1, 2), Interval(9, 9)))).isEmpty)
    assert(ThetaJoin.join(table, Seq(q(Interval(1, 2), Interval(3, 9)))).nonEmpty)
  }

  test("join over a compressed elementwise table returns exactly the queried cells") {
    val rows = (0L until 100L).map(i => Seq(i, i))
    val table = ProvRC.compress(rows.iterator.map(_.toArray), 1, 1)
    val res = ThetaJoin.join(table, Seq(q(Interval(10, 19)), q(Interval(40, 44))))
    assert(ThetaJoin.cellSet(res) == reference(rows, 1, Seq(q(Interval(10, 19)), q(Interval(40, 44)))))
  }

  test("join over compressed aggregate table fans out to the full input axis") {
    val rows = for (i <- 0L until 10L; k <- 0L until 6L) yield Seq(i, i, k)
    val table = ProvRC.compress(rows.iterator.map(_.toArray), 1, 2)
    val res = ThetaJoin.join(table, Seq(q(Interval(3, 4))))
    assert(ThetaJoin.cellSet(res) == reference(rows, 1, Seq(q(Interval(3, 4)))))
  }

  test("join result matches brute force on an incompressible permutation") {
    val n = 32L
    val rows = (0L until n).map(b => Seq(b, (7 * b) % n))
    val table = ProvRC.compress(rows.iterator.map(_.toArray), 1, 1)
    val query = Seq(q(Interval(5, 12)))
    assert(ThetaJoin.cellSet(ThetaJoin.join(table, query)) == reference(rows, 1, query))
  }

  test("mergeRects merges adjacent rectangles along one axis") {
    val rects = Vector(q(Interval(0, 4)), q(Interval(5, 9)), q(Interval(20, 24)))
    val merged = ThetaJoin.mergeRects(rects)
    assert(merged.toSet == Set(q(Interval(0, 9)), q(Interval(20, 24))))
  }

  test("mergeRects drops contained rectangles") {
    val rects = Vector(q(Interval(0, 9), Interval(0, 9)), q(Interval(2, 3), Interval(4, 5)))
    assert(ThetaJoin.mergeRects(rects) == Vector(q(Interval(0, 9), Interval(0, 9))))
  }

  test("mergeRects merges a grid of unit rects into one") {
    val rects = for (i <- 0L until 4L; j <- 0L until 4L)
      yield q(Interval.point(i), Interval.point(j))
    val merged = ThetaJoin.mergeRects(rects.toVector)
    assert(merged == Vector(q(Interval(0, 3), Interval(0, 3))))
  }

  test("mergeRects is a no-op on disjoint non-adjacent rects") {
    val rects = Vector(q(Interval(0, 1)), q(Interval(5, 6)))
    assert(ThetaJoin.mergeRects(rects).toSet == rects.toSet)
  }

  test("join without merge (DSLog-NoMerge) covers the same cells") {
    val rows = for (i <- 0L until 20L; k <- 0L until 3L) yield Seq(i, i, k)
    val table = ProvRC.compress(rows.iterator.map(_.toArray), 1, 2)
    val query = Seq(q(Interval(0, 9)), q(Interval(10, 19)))
    val merged = ThetaJoin.join(table, query, merge = true)
    val raw = ThetaJoin.join(table, query, merge = false)
    assert(ThetaJoin.cellSet(merged) == ThetaJoin.cellSet(raw))
    assert(merged.size <= raw.size)
  }

  test("two-hop composition equals brute-force join composition") {
    // hop1: elementwise shift a = b + 2 over [0,50); hop2: aggregate pairs c = b/2
    val r1 = (0L until 50L).map(b => Seq(b, b + 2))
    val r2 = (2L until 52L).map(b => Seq(b, b / 2))
    val t1 = ProvRC.compress(r1.iterator.map(_.toArray), 1, 1)
    val t2 = ProvRC.compress(r2.iterator.map(_.toArray), 1, 1)
    val query = Seq(q(Interval(10, 13)))
    val hop1 = ThetaJoin.join(t1, query)
    val hop2 = ThetaJoin.join(t2, hop1)
    // brute force
    val mid = reference(r1, 1, query)
    val expected = r2.filter(r => mid.contains(Vector(r.head))).map(r => Vector(r(1))).toSet
    assert(ThetaJoin.cellSet(hop2) == expected)
  }

  test("diagonal lineage (two value axes relative to one key axis) stays exact") {
    // out b <- in (b, b): a single compressed row with two RelEnc(0, 0).
    val rows = (0L until 20L).map(b => Seq(b, b, b))
    val table = ProvRC.compress(rows.iterator.map(_.toArray), 1, 2)
    assert(table.size == 1)
    val query = Seq(q(Interval(3, 7)))
    val res = ThetaJoin.join(table, query)
    assert(ThetaJoin.cellSet(res) == reference(rows, 1, query))
  }

  test("volume is exact for disjoint rect sets") {
    val rects = Vector(q(Interval(0, 4), Interval(0, 1)), q(Interval(10, 10), Interval(0, 0)))
    assert(ThetaJoin.volume(rects) == 11)
  }

  test("expand enumerates every cell of a rect") {
    val cells = ThetaJoin.expand(q(Interval(0, 1), Interval(5, 6))).toSet
    assert(cells == Set(Vector(0L, 5L), Vector(0L, 6L), Vector(1L, 5L), Vector(1L, 6L)))
  }
}
