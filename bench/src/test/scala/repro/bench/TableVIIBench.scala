package repro.bench

import repro.SparkSpec

/** Reproduces Table VII: on-disk lineage size across the seven storage
  * formats for the twelve evaluation operations. Scale with TABLE7_SCALE
  * (1.0 = the sizes documented in EXPERIMENTS.md).
  */
class TableVIIBench extends SparkSpec {

  test("Table VII: compression ratio comparison across formats") {
    val scale = sys.env.getOrElse("TABLE7_SCALE", "1.0").toDouble
    val rows = Benchmarks.runTableVII(spark, scale)
    val byName = rows.map(r => r.name -> r).toMap

    // Shape assertions mirroring the paper's headline claims.
    val structured = Seq("Negative", "Addition", "Aggregate", "Repetition",
      "Matrix*Vector", "Matrix*Matrix")
    structured.foreach { n =>
      val r = byName(n)
      assert(r.sizes("ProvRC") * 20 < r.sizes("Parquet"),
        s"$n: ProvRC should beat Parquet by a large factor")
      assert(r.sizes("ProvRC").toDouble / r.raw < 0.001,
        s"$n: ProvRC ratio should be <0.1% of raw")
    }
    // Partially structured lineage still compresses well (<0.5% in paper,
    // we assert <2%).
    Seq("ImgFilter", "Lime", "DRISE", "Inner Join").foreach { n =>
      val r = byName(n)
      assert(r.sizes("ProvRC").toDouble / r.raw < 0.02, s"$n ratio too high")
    }
    // Sort is ProvRC's worst case: no better than ~raw binary.
    assert(byName("Sort").sizes("ProvRC").toDouble / byName("Sort").raw > 0.05)
    // ProvRC-GZip rescues unstructured lineage (paper: Sort, Group By).
    Seq("Sort", "Group By").foreach { n =>
      val r = byName(n)
      assert(r.sizes("ProvRC-GZip") < r.sizes("ProvRC"), s"$n: gzip should help")
    }
    // Array is uncompressed, same ballpark as Raw.
    rows.foreach(r => assert(r.sizes("Array") > r.raw / 4))
  }
}
