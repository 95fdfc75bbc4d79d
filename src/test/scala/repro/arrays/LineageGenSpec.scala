package repro.arrays

import repro.SparkSpec

/** Semantics checks for the Spark-scale lineage generators: row counts and
  * spot-checked relationships against the operation definitions.
  */
class LineageGenSpec extends SparkSpec {

  test("elementwise: one row per cell, b == a") {
    val df = LineageGen.elementwise(spark, Seq(6L, 7L))
    assert(df.count() == 42)
    df.collect().foreach { r =>
      assert(r.getLong(0) == r.getLong(2) && r.getLong(1) == r.getLong(3))
    }
  }

  test("aggregate2d axis=1: each output receives the full second axis") {
    val df = LineageGen.aggregate2d(spark, 4, 5, axis = 1)
    assert(df.count() == 20)
    val rows = df.collect()
    assert(rows.forall(r => r.getLong(0) == r.getLong(1)))
    assert(rows.map(_.getLong(2)).distinct.sorted.toSeq == (0L to 4L))
  }

  test("aggregate2d axis=0: each output receives the full first axis") {
    val rows = LineageGen.aggregate2d(spark, 4, 5, axis = 0).collect()
    assert(rows.forall(r => r.getLong(0) == r.getLong(2)))
  }

  test("aggregateAll: single output cell") {
    val rows = LineageGen.aggregateAll(spark, Seq(3L, 4L)).collect()
    assert(rows.length == 12)
    assert(rows.forall(_.getLong(0) == 0L))
  }

  test("tile1d: a = b mod n") {
    val rows = LineageGen.tile1d(spark, 10, 3).collect()
    assert(rows.length == 30)
    rows.foreach(r => assert(r.getLong(1) == r.getLong(0) % 10))
  }

  test("matmul left and right cover the k-dimension") {
    val l = LineageGen.matmulLeft(spark, 3, 4, 5).collect()
    assert(l.length == 3 * 4 * 5)
    l.foreach { r =>
      assert(r.getLong(0) == r.getLong(2)) // C row i <- A row i
      assert(r.getLong(3) >= 0 && r.getLong(3) < 4)
    }
    val rr = LineageGen.matmulRight(spark, 3, 4, 5).collect()
    rr.foreach(r => assert(r.getLong(1) == r.getLong(3))) // C col j <- B col j
  }

  test("matvec: y[i] gets row i of A and all of x") {
    val l = LineageGen.matvecLeft(spark, 4, 6).collect()
    assert(l.length == 24)
    l.foreach(r => assert(r.getLong(0) == r.getLong(1)))
    val rr = LineageGen.matvecRight(spark, 4, 6).collect()
    assert(rr.map(r => (r.getLong(0), r.getLong(1))).toSet ==
      (for (i <- 0L until 4L; k <- 0L until 6L) yield (i, k)).toSet)
  }

  test("conv2dSame: interior cells see 9 sources, corners 4") {
    val df = LineageGen.conv2dSame(spark, 5, 5, 3, 3)
    val byOut = df.collect().groupBy(r => (r.getLong(0), r.getLong(1)))
    assert(byOut((2L, 2L)).length == 9)
    assert(byOut((0L, 0L)).length == 4)
    assert(byOut((0L, 2L)).length == 6)
  }

  test("convChannels: every input channel contributes") {
    val df = LineageGen.convChannels(spark, 4, 4, cIn = 3, cOut = 2)
    val byOut = df.collect().groupBy(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
    assert(byOut((0L, 2L, 2L)).length == 3 * 9)
    assert(byOut((1L, 0L, 0L)).length == 3 * 4)
  }

  test("rot90 is a bijection on cells") {
    val rows = LineageGen.rot90(spark, 8).collect()
    assert(rows.length == 64)
    assert(rows.map(r => (r.getLong(2), r.getLong(3))).distinct.length == 64)
    rows.foreach(r => assert(r.getLong(2) == r.getLong(1) && r.getLong(3) == 7 - r.getLong(0)))
  }

  test("flipH mirrors the second axis") {
    LineageGen.flipH(spark, 3, 5).collect().foreach { r =>
      assert(r.getLong(2) == r.getLong(0))
      assert(r.getLong(3) == 4 - r.getLong(1))
    }
  }

  test("resizeNearest: source index floor-scales") {
    LineageGen.resizeNearest(spark, 4, 4, 8, 8).collect().foreach { r =>
      assert(r.getLong(2) == r.getLong(0) * 2)
      assert(r.getLong(3) == r.getLong(1) * 2)
    }
  }

  test("sortPerm is a permutation, deterministic in the seed") {
    val a = LineageGen.sortPerm(spark, 100, 5).collect()
    val b = LineageGen.sortPerm(spark, 100, 5).collect()
    assert(a.map(_.getLong(1)).sorted.toSeq == (0L until 100L))
    assert(a.map(_.toSeq).toSeq == b.map(_.toSeq).toSeq)
  }

  test("groupBy lineage: one row per (input row, column); group ranks dense") {
    val keys = Array(3, 1, 3, 2)
    val rows = LineageGen.groupBy(spark, keys, nCols = 2).collect()
    assert(rows.length == 8)
    // key 1 -> group 0, key 2 -> group 1, key 3 -> group 2
    val g = rows.filter(_.getLong(2) == 0L).map(_.getLong(0)).distinct
    assert(g.toSeq == Seq(2L))
  }

  test("joinSide maps output rows to matched source rows with column offset") {
    val rows = LineageGen.joinSide(spark, Array(5, 5, 9), nCols = 2, colOffset = 3).collect()
    assert(rows.length == 6)
    rows.foreach { r =>
      assert(r.getLong(1) == r.getLong(3) + 3) // out col = in col + offset
    }
    assert(rows.filter(_.getLong(0) == 2L).forall(_.getLong(2) == 9L))
  }
}
