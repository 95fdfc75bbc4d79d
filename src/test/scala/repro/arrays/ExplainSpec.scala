package repro.arrays

import repro.SparkSpec
import repro.core.LineageCompressor

class ExplainSpec extends SparkSpec {

  test("lime lineage is deterministic in the seed") {
    val a = Explain.lime(spark, 64, 64, outCells = 3, seed = 5).collect().map(_.toSeq).toSet
    val b = Explain.lime(spark, 64, 64, outCells = 3, seed = 5).collect().map(_.toSeq).toSet
    assert(a == b)
    val c = Explain.lime(spark, 64, 64, outCells = 3, seed = 6).collect().map(_.toSeq).toSet
    assert(a != c)
  }

  test("lime lineage rows are distinct and in-bounds") {
    val df = Explain.lime(spark, 32, 48, outCells = 2, grid = 4, segs = 5, seed = 1)
    val rows = df.collect()
    assert(rows.length == rows.map(_.toSeq).distinct.length)
    rows.foreach { r =>
      assert(r.getLong(0) >= 0 && r.getLong(0) < 2)
      assert(r.getLong(1) >= 0 && r.getLong(1) < 32)
      assert(r.getLong(2) >= 0 && r.getLong(2) < 48)
    }
  }

  test("lime (superpixel rectangles) compresses far better than raw row count") {
    val df = Explain.lime(spark, 64, 64, outCells = 3, grid = 8, segs = 8, seed = 2)
    val n = df.count()
    val c = LineageCompressor.compress(df, nOut = 1)
    assert(c.size.toLong * 50 < n, s"${c.size} rows vs $n raw")
  }

  test("drise blob lineage compresses but less than lime") {
    val lime = Explain.lime(spark, 64, 64, outCells = 3, seed = 3)
    val drise = Explain.drise(spark, 64, 64, outCells = 3, blobs = 30, maxRadius = 4, seed = 3)
    val cl = LineageCompressor.compress(lime, nOut = 1).size.toDouble / lime.count()
    val cd = LineageCompressor.compress(drise, nOut = 1).size.toDouble / drise.count()
    assert(cd < 0.5, "drise should still compress (blobs are rectangles)")
    assert(cl < cd * 2, "lime should compress at least comparably")
  }

  test("drise stays in image bounds") {
    val rows = Explain.drise(spark, 16, 16, outCells = 1, blobs = 10, maxRadius = 8, seed = 4).collect()
    rows.foreach { r =>
      assert(r.getLong(1) >= 0 && r.getLong(1) < 16)
      assert(r.getLong(2) >= 0 && r.getLong(2) < 16)
    }
  }
}
