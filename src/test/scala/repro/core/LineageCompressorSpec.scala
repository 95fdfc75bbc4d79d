package repro.core

import repro.SparkSpec
import repro.arrays.LineageGen
import repro.provrc._

class LineageCompressorSpec extends SparkSpec {

  test("distributed compression of 1-D elementwise lineage reaches the single-row optimum") {
    val df = LineageGen.elementwise(spark, Seq(100000L))
    val c = LineageCompressor.compress(df, nOut = 1)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, 99999)))
    assert(c.head.in == Vector(RelEnc(0, Interval(0, 0))))
  }

  test("distributed compression of 2-D elementwise lineage reaches the single-row optimum") {
    val df = LineageGen.elementwise(spark, Seq(300L, 200L))
    val c = LineageCompressor.compress(df, nOut = 2)
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, 299), Interval(0, 199)))
  }

  test("aggregate over axis 1 compresses to one row (paper Fig 1 at scale)") {
    val df = LineageGen.aggregate2d(spark, 500, 400, axis = 1)
    val c = LineageCompressor.compress(df, nOut = 1)
    assert(c.size == 1)
    assert(c.head.in(0) == RelEnc(0, Interval(0, 0)))
    assert(c.head.in(1) == AbsEnc(Interval(0, 399)))
  }

  test("matmul left lineage compresses to one row") {
    val c = LineageCompressor.compress(LineageGen.matmulLeft(spark, 40, 30, 20), nOut = 2)
    assert(c.size == 1)
    assert(c.head.in(1) == AbsEnc(Interval(0, 29)))
  }

  test("matmul right lineage compresses to one row") {
    val c = LineageCompressor.compress(LineageGen.matmulRight(spark, 40, 30, 20), nOut = 2)
    assert(c.size == 1)
    assert(c.head.in(0) == AbsEnc(Interval(0, 29)))
    assert(c.head.in(1) == RelEnc(1, Interval(0, 0)))
  }

  test("tile lineage compresses to one row per repetition") {
    val c = LineageCompressor.compress(LineageGen.tile1d(spark, 10000, 4), nOut = 1)
    assert(c.size == 4)
  }

  test("conv2d same-padding lineage compresses to O(1) rows") {
    val c = LineageCompressor.compress(LineageGen.conv2dSame(spark, 64, 64, 3, 3), nOut = 2)
    assert(c.size <= 16, s"got ${c.size} rows")
  }

  test("sort permutation lineage stays incompressible") {
    val n = 20000
    val c = LineageCompressor.compress(LineageGen.sortPerm(spark, n, seed = 7), nOut = 1)
    assert(c.size > n / 2)
  }

  test("distributed compression is lossless on conv lineage") {
    val df = LineageGen.conv2dSame(spark, 12, 9, 3, 3)
    val c = LineageCompressor.compress(df, nOut = 2)
    val expanded = ProvRC.decompress(c).map(_.toVector).toSet
    val expected = df.collect().map(r => Vector(r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(expanded == expected)
  }

  test("distributed compression is lossless on an arbitrary permutation") {
    val df = LineageGen.sortPerm(spark, 500, seed = 3)
    val c = LineageCompressor.compress(df, nOut = 1)
    val expanded = ProvRC.decompress(c).map(_.toVector).toSet
    val expected = df.collect().map(r => Vector(r.getLong(0), r.getLong(1))).toSet
    assert(expanded == expected)
  }

  test("compressRelation reorders key/value columns") {
    val df = LineageGen.elementwise(spark, Seq(1000L)) // cols b1, a1
    val c = LineageCompressor.compressRelation(df, keyCols = Seq("a1"), valCols = Seq("b1"))
    assert(c.size == 1)
    assert(c.head.out == Vector(Interval(0, 999)))
  }

  test("partition count does not change the compressed result for structured lineage") {
    val df = LineageGen.aggregate2d(spark, 64, 32, axis = 1)
    val c1 = LineageCompressor.compress(df, nOut = 1, partitions = 1)
    val c16 = LineageCompressor.compress(df, nOut = 1, partitions = 16)
    assert(c1 == c16)
  }

  test("dedupe flag collapses duplicate rows before compression") {
    val df = LineageGen.elementwise(spark, Seq(100L))
    val dup = df.union(df)
    val c = LineageCompressor.compress(dup, nOut = 1, dedupe = true)
    assert(c.size == 1)
  }
}
