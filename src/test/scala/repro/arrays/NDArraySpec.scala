package repro.arrays

import org.scalatest.funsuite.AnyFunSuite

class NDArraySpec extends AnyFunSuite {

  test("flatIndex and coords are inverse") {
    val a = NDArray.zeros(Vector(3, 4, 5))
    for (f <- 0 until a.size) {
      assert(a.flatIndex(a.coords(f)) == f)
    }
  }

  test("row-major layout: last axis is contiguous") {
    val a = NDArray.fill(Vector(2, 3))(_.toDouble)
    assert(a(0, 0) == 0.0)
    assert(a(0, 2) == 2.0)
    assert(a(1, 0) == 3.0)
  }

  test("strides match shape") {
    val a = NDArray.zeros(Vector(4, 5, 6))
    assert(a.strides == Vector(30, 6, 1))
  }

  test("random is deterministic in the seed") {
    val a = NDArray.random(Vector(10), 3)
    val b = NDArray.random(Vector(10), 3)
    val c = NDArray.random(Vector(10), 4)
    assert(a.data.sameElements(b.data))
    assert(!a.data.sameElements(c.data))
  }

  test("reshape preserves data, rejects bad sizes") {
    val a = NDArray.fill(Vector(6))(_.toDouble)
    val b = a.reshape(Vector(2, 3))
    assert(b(1, 2) == 5.0)
    intercept[IllegalArgumentException](a.reshape(Vector(4, 2)))
  }

  test("map applies pointwise") {
    val a = NDArray.of(1.0, -2.0)
    assert(a.map(math.abs).data.toSeq == Seq(1.0, 2.0))
  }

  test("shape/data mismatch rejected") {
    intercept[IllegalArgumentException](new NDArray(Vector(3), new Array[Double](2)))
  }

  test("LocalRel rawCsvBytes counts digits, commas and newlines") {
    val r = LocalRel(1, 1, Vector(Array(1L, 23L)))
    assert(r.rawCsvBytes == 5) // "1,23\n"
  }

  test("LocalRel.fromPairs dedupes") {
    val r = LocalRel.fromPairs(Seq((Seq(0), Seq(1)), (Seq(0), Seq(1))), 1, 1)
    assert(r.rows.size == 1)
  }
}
