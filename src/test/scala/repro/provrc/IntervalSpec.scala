package repro.provrc

import org.scalatest.funsuite.AnyFunSuite

class IntervalSpec extends AnyFunSuite {

  test("point interval has length 1 and contains only itself") {
    val p = Interval.point(5)
    assert(p.len == 1)
    assert(p.contains(5))
    assert(!p.contains(4))
    assert(!p.contains(6))
  }

  test("len of a range") {
    assert(Interval(3, 7).len == 5)
    assert(Interval(-4, -1).len == 4)
  }

  test("intersect of overlapping intervals") {
    assert(Interval(1, 5).intersect(Interval(3, 9)) == Some(Interval(3, 5)))
  }

  test("intersect of disjoint intervals is empty") {
    assert(Interval(1, 2).intersect(Interval(4, 9)).isEmpty)
  }

  test("intersect of touching intervals is the shared point") {
    assert(Interval(1, 4).intersect(Interval(4, 9)) == Some(Interval(4, 4)))
  }

  test("plus is the Minkowski sum") {
    assert(Interval(1, 2).plus(Interval(-1, 3)) == Interval(0, 5))
  }

  test("shift moves both bounds") {
    assert(Interval(1, 2).shift(10) == Interval(11, 12))
    assert(Interval(1, 2).shift(-5) == Interval(-4, -3))
  }

  test("mergeable for overlap, adjacency; not for gaps") {
    assert(Interval(1, 3).mergeable(Interval(2, 5)))
    assert(Interval(1, 3).mergeable(Interval(4, 5)))
    assert(Interval(4, 5).mergeable(Interval(1, 3)))
    assert(!Interval(1, 3).mergeable(Interval(5, 6)))
  }

  test("union spans both") {
    assert(Interval(1, 3).union(Interval(4, 9)) == Interval(1, 9))
  }

  test("containsAll") {
    assert(Interval(1, 9).containsAll(Interval(2, 8)))
    assert(Interval(1, 9).containsAll(Interval(1, 9)))
    assert(!Interval(2, 8).containsAll(Interval(1, 9)))
  }

  test("invalid interval rejected") {
    intercept[IllegalArgumentException](Interval(3, 2))
  }
}
