package repro.provrc

import org.scalatest.funsuite.AnyFunSuite

class CandsSpec extends AnyFunSuite {

  private def c(abs: Option[Interval], rels: Option[Interval]*) =
    Cands(abs, rels.toVector)

  test("absOnly builds an abs component with empty rels") {
    val x = Cands.absOnly(Interval(1, 2), 3)
    assert(x.abs == Some(Interval(1, 2)))
    assert(x.rels == Vector(None, None, None))
    assert(x.defined)
  }

  test("defined is false only when every component is gone") {
    assert(!c(None, None).defined)
    assert(c(Some(Interval(0, 0)), None).defined)
    assert(c(None, Some(Interval(0, 0))).defined)
  }

  test("equalComponents keeps equal abs, drops unequal") {
    val a = c(Some(Interval(1, 2)), Some(Interval(0, 0)))
    val b = c(Some(Interval(1, 2)), Some(Interval(5, 5)))
    val e = a.equalComponents(b)
    assert(e.abs == Some(Interval(1, 2)))
    assert(e.rels == Vector(None))
  }

  test("equalComponents with one side undefined drops the component") {
    val a = c(Some(Interval(1, 2)), None)
    val b = c(None, None)
    assert(!a.equalComponents(b).defined)
  }

  test("unionComponents merges overlapping/adjacent intervals") {
    val a = c(Some(Interval(0, 4)), Some(Interval(-1, 0)))
    val b = c(Some(Interval(5, 9)), Some(Interval(2, 3)))
    val u = a.unionComponents(b)
    assert(u.abs == Some(Interval(0, 9)))
    assert(u.rels == Vector(None)) // gap between [-1,0] and [2,3]
  }

  test("unionComponents drops non-mergeable components") {
    val a = c(Some(Interval(0, 1)), None)
    val b = c(Some(Interval(5, 6)), None)
    assert(!a.unionComponents(b).defined)
  }

  test("equalComponents is commutative") {
    val a = c(Some(Interval(1, 2)), Some(Interval(0, 1)))
    val b = c(Some(Interval(1, 2)), Some(Interval(0, 2)))
    assert(a.equalComponents(b) == b.equalComponents(a))
  }

  test("unionComponents is commutative") {
    val a = c(Some(Interval(0, 4)), Some(Interval(2, 2)))
    val b = c(Some(Interval(3, 8)), Some(Interval(3, 4)))
    assert(a.unionComponents(b) == b.unionComponents(a))
  }
}
