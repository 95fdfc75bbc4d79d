package repro.provrc

import org.scalatest.funsuite.AnyFunSuite

class ReshapeSpec extends AnyFunSuite {
  import Reshape._

  private def compress(rows: Seq[Seq[Long]], nOut: Int, nIn: Int) =
    ProvRC.compress(rows.iterator.map(_.toArray), nOut, nIn)

  test("paper Fig 6: generalized aggregate lineage instantiates for a larger array") {
    // Aggregate-all over a 2-cell array: out [0,0] <- in [0,1]
    val c2 = compress((0L until 2L).map(a => Seq(0L, a)), 1, 1)
    val g = generalize(c2, Seq("d1" -> 2L))
    assert(isGeneralized(g))
    val c4 = instantiate(g, Map("d1" -> 4L))
    val expected = compress((0L until 4L).map(a => Seq(0L, a)), 1, 1)
    assert(c4 == expected)
  }

  test("elementwise lineage generalizes over the shared extent") {
    val c = compress((0L until 10L).map(i => Seq(i, i)), 1, 1)
    val g = generalize(c, Seq("n" -> 10L))
    assert(isGeneralized(g))
    val inst = instantiate(g, Map("n" -> 25L))
    assert(inst == compress((0L until 25L).map(i => Seq(i, i)), 1, 1))
  }

  test("matmul lineage generalizes over all three dimensions") {
    def mm(n: Long, m: Long, p: Long) =
      compress(for (i <- 0L until n; j <- 0L until p; k <- 0L until m) yield Seq(i, j, i, k), 2, 2)
    val g = generalize(mm(4, 5, 6), Seq("n" -> 4L, "m" -> 5L, "p" -> 6L))
    assert(isGeneralized(g))
    assert(instantiate(g, Map("n" -> 7L, "m" -> 3L, "p" -> 2L)) == mm(7, 3, 2))
  }

  test("intervals not matching any extent stay concrete") {
    val c = Vector(CRow(Vector(Interval(2, 5)), Vector(AbsEnc(Interval(1, 3)))))
    val g = generalize(c, Seq("d" -> 10L))
    assert(!isGeneralized(g))
    assert(instantiate(g, Map("d" -> 99L)) == c)
  }

  test("ambiguous equal extents pick the first dimension (validation catches errors)") {
    val c = Vector(CRow(Vector(Interval(0, 3)), Vector(AbsEnc(Interval(0, 3)))))
    val g = generalize(c, Seq("a" -> 4L, "b" -> 4L))
    val inst = instantiate(g, Map("a" -> 6L, "b" -> 2L))
    assert(inst == Vector(CRow(Vector(Interval(0, 5)), Vector(AbsEnc(Interval(0, 5))))))
  }

  test("relative deltas are never generalized") {
    val c = compress((0L until 6L).map(i => Seq(i, i)), 1, 1)
    val g = generalize(c, Seq("n" -> 6L))
    g.foreach(_.in.foreach {
      case GRelEnc(_, d) => assert(d == Interval(0, 0))
      case _             => fail("expected relative encoding")
    })
  }

  test("generalization of a shape-independent table is the identity under instantiate") {
    val c = Vector(CRow(Vector(Interval(7, 9)), Vector(AbsEnc(Interval(11, 12)))))
    val g = generalize(c, Seq("n" -> 100L))
    assert(instantiate(g, Map("n" -> 3L)) == c)
  }
}
