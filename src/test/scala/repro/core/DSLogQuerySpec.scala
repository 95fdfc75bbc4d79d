package repro.core

import repro.{Oracle, SparkSpec}
import repro.arrays.LineageGen
import repro.provrc._

/** End-to-end DSLog query correctness, including DuckDB oracle checks of
  * multi-hop θ-join chains against the equivalent relational join.
  */
class DSLogQuerySpec extends SparkSpec {
  import ThetaJoin.Rect

  private def rect(ivs: Interval*): Rect = ivs.toVector

  test("single-hop forward query over an elementwise op") {
    val log = new DSLog(spark)
    log.defineArray("X", Seq(1000))
    log.defineArray("Y", Seq(1000))
    log.registerLineage("X", "Y", LineageGen.elementwise(spark, Seq(1000L)))
    val res = log.provQuery(Seq("X", "Y"), Seq(rect(Interval(10, 19))))
    assert(res == Vector(Vector(Interval(10, 19))))
  }

  test("single-hop backward query over an aggregate op fans out") {
    val log = new DSLog(spark)
    log.defineArray("A", Seq(50, 40))
    log.defineArray("B", Seq(50))
    log.registerLineage("A", "B", LineageGen.aggregate2d(spark, 50, 40, axis = 1))
    val res = log.provQuery(Seq("B", "A"), Seq(rect(Interval(3, 5))))
    assert(ThetaJoin.cellSet(res) ==
      (for (i <- 3L to 5L; k <- 0L until 40L) yield Vector(i, k)).toSet)
  }

  test("forward query through rot90 then flip matches brute force") {
    val n = 32L
    val log = new DSLog(spark)
    log.defineArray("I0", Seq(n, n))
    log.defineArray("I1", Seq(n, n))
    log.defineArray("I2", Seq(n, n))
    log.registerLineage("I0", "I1", LineageGen.rot90(spark, n))
    log.registerLineage("I1", "I2", LineageGen.flipH(spark, n, n))
    val q = Seq(rect(Interval(0, 3), Interval(5, 6)))
    val res = log.provQuery(Seq("I0", "I1", "I2"), q)
    // brute force: rot90: B[i,j]=A[j,n-1-i]  =>  cell (i0,j0) feeds (n-1-j0, i0)
    // flip: C[i,j]=B[i,n-1-j]                =>  (i1,j1) feeds (i1, n-1-j1)
    val expected = (for (i0 <- 0L to 3L; j0 <- 5L to 6L) yield {
      val (i1, j1) = (n - 1 - j0, i0)
      Vector(i1, n - 1 - j1)
    }).toSet
    assert(ThetaJoin.cellSet(res) == expected)
  }

  test("two-hop query agrees with the DuckDB relational join (oracle)") {
    val log = new DSLog(spark)
    log.defineArray("X", Seq(200))
    log.defineArray("Y", Seq(200))
    log.defineArray("Z", Seq(200))
    val r1 = LineageGen.elementwise(spark, Seq(200L))          // X -> Y
    val r2 = LineageGen.conv2dSame(spark, 200L, 1L, 3, 1)      // 1-D conv as (i, 0)
      .select("b1", "a1")                                      // Y -> Z over first axis
    log.registerLineage("X", "Y", r1)
    log.registerLineage("Y", "Z", r2)
    val res = log.provQuery(Seq("X", "Y", "Z"), Seq(rect(Interval(17, 42))))
    val resDf = QueryProcessor.rectsToDf(spark, res, Seq("c1"))
    Oracle.assertEquivalent(
      resDf,
      """SELECT DISTINCT r2.b1 AS c1
        |FROM r1 JOIN r2 ON r1.b1 = r2.a1
        |WHERE CAST(r1.a1 AS BIGINT) BETWEEN 17 AND 42""".stripMargin,
      "r1" -> r1, "r2" -> r2,
    )
  }

  test("three-hop backward query agrees with the DuckDB relational join (oracle)") {
    val n = 60L
    val log = new DSLog(spark)
    Seq("P", "Q", "R", "S").foreach(a => log.defineArray(a, Seq(n)))
    val rels = Seq(
      LineageGen.elementwise(spark, Seq(n)),            // P -> Q
      LineageGen.tile1d(spark, n / 2, 2),               // Q -> R (|Q| = n/2 viewed)
      LineageGen.conv2dSame(spark, n, 1L, 3, 1).select("b1", "a1"), // R -> S
    )
    log.registerLineage("P", "Q", rels(0))
    log.registerLineage("Q", "R", rels(1))
    log.registerLineage("R", "S", rels(2))
    val res = log.provQuery(Seq("S", "R", "Q", "P"), Seq(rect(Interval(10, 14))))
    val resDf = QueryProcessor.rectsToDf(spark, res, Seq("c1"))
    Oracle.assertEquivalent(
      resDf,
      """SELECT DISTINCT r1.a1 AS c1
        |FROM r3 JOIN r2 ON r3.a1 = r2.b1 JOIN r1 ON r2.a1 = r1.b1
        |WHERE CAST(r3.b1 AS BIGINT) BETWEEN 10 AND 14""".stripMargin,
      "r1" -> rels(0), "r2" -> rels(1), "r3" -> rels(2),
    )
  }

  test("joinChain baseline matches the in-situ result") {
    val n = 100L
    val log = new DSLog(spark)
    Seq("X", "Y", "Z").foreach(a => log.defineArray(a, Seq(n)))
    val r1 = LineageGen.conv2dSame(spark, n, 1L, 3, 1).select("b1", "a1")
    val r2 = LineageGen.elementwise(spark, Seq(n))
    log.registerLineage("X", "Y", r1)
    log.registerLineage("Y", "Z", r2)
    val q = Seq(rect(Interval(40, 49)))
    val insitu = log.provQuery(Seq("X", "Y", "Z"), q)
    // baseline: hops keyed on X then Y — forward orientation (a-cols first)
    val hops = Seq(
      (r1.select("a1", "b1"), 1),
      (r2.select("a1", "b1"), 1),
    )
    val baseline = QueryProcessor.joinChain(hops, q).collect().map(_.getLong(0)).toSet
    assert(ThetaJoin.cellSet(insitu).map(_.head) == baseline)
  }

  test("arrayScanChain matches the in-situ result") {
    val n = 80L
    val r1 = LineageGen.elementwise(spark, Seq(n))
    val r2 = LineageGen.flipH(spark, 1L, n).select("b2", "a2")
    val log = new DSLog(spark)
    Seq("X", "Y", "Z").foreach(a => log.defineArray(a, Seq(n)))
    log.registerLineage("X", "Y", r1)
    log.registerLineage("Y", "Z", r2)
    val q = Seq(rect(Interval(5, 11)))
    val insitu = log.provQuery(Seq("X", "Y", "Z"), q)

    def cols(df: org.apache.spark.sql.DataFrame): Array[Array[Long]] = {
      val rows = df.collect()
      Array.tabulate(df.columns.length)(i => rows.map(_.getLong(i)))
    }
    val scan = QueryProcessor.arrayScanChain(
      Seq((cols(r1.select("a1", "b1")), 1), (cols(r2.select("a2", "b2")), 1)), q)
    assert(ThetaJoin.cellSet(insitu) == scan)
  }

  test("merge=false (DSLog-NoMerge) returns the same cells with more rectangles") {
    val log = new DSLog(spark)
    log.defineArray("A", Seq(40, 30))
    log.defineArray("B", Seq(40))
    log.registerLineage("A", "B", LineageGen.aggregate2d(spark, 40, 30, axis = 1))
    val q = Seq(rect(Interval(0, 9)), rect(Interval(10, 19)))
    val merged = log.provQuery(Seq("B", "A"), q, merge = true)
    val raw = log.provQuery(Seq("B", "A"), q, merge = false)
    assert(ThetaJoin.cellSet(merged) == ThetaJoin.cellSet(raw))
    assert(merged.size <= raw.size)
  }

  test("spark executor hop path agrees with the driver path on a large table") {
    val n = 30000
    val log = new DSLog(spark)
    log.defineArray("U", Seq(n))
    log.defineArray("V", Seq(n))
    log.registerLineage("U", "V", LineageGen.sortPerm(spark, n, seed = 11))
    val q = Seq(rect(Interval(100, 149)))
    val viaSpark = log.provQuery(Seq("U", "V"), q, useSpark = true)
    val viaDriver = log.provQuery(Seq("U", "V"), q, useSpark = false)
    assert(ThetaJoin.cellSet(viaSpark) == ThetaJoin.cellSet(viaDriver))
    assert(ThetaJoin.cellSet(viaSpark).size == 50)
  }

  test("query on unknown edge fails clearly") {
    val log = new DSLog(spark)
    log.defineArray("X", Seq(10))
    log.defineArray("Y", Seq(10))
    intercept[NoSuchElementException](log.provQuery(Seq("X", "Y"), Seq(rect(Interval(0, 1)))))
  }
}
