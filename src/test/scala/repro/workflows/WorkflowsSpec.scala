package repro.workflows

import repro.{Oracle, SparkSpec}
import repro.core.{DSLog, QueryProcessor}
import repro.provrc.{Interval, ThetaJoin}

class WorkflowsSpec extends SparkSpec {

  private def ingest(p: Pipeline): DSLog = {
    val log = new DSLog(spark)
    p.arrays.foreach { case (n, s) => log.defineArray(n, s) }
    p.steps.foreach(s => log.registerLineage(s.from, s.to, s.relation))
    log
  }

  test("image pipeline (small) ingests and answers a forward query") {
    val p = Workflows.imagePipeline(spark, src = 64, n = 32)
    assert(p.steps.size == 5)
    val log = ingest(p)
    val res = log.provQuery(p.path,
      Seq(Vector(Interval(0, 31), Interval(0, 31))))
    // A quarter-image patch reaches at least one detection output.
    assert(ThetaJoin.cellSet(res).nonEmpty)
    ThetaJoin.cellSet(res).foreach(c => assert(c.head >= 0 && c.head < 5))
  }

  test("image pipeline forward query matches the relational join (oracle)") {
    val p = Workflows.imagePipeline(spark, src = 32, n = 16)
    val log = ingest(p)
    val q = Seq(Vector(Interval(3, 5), Interval(8, 12)))
    val res = log.provQuery(p.path, q)
    val resDf = QueryProcessor.rectsToDf(spark, res, Seq("c1"))
    Oracle.assertEquivalent(
      resDf,
      """SELECT DISTINCT r5.b1 AS c1
        |FROM r1 JOIN r2 ON r1.b1 = r2.a1 AND r1.b2 = r2.a2
        |        JOIN r3 ON r2.b1 = r3.a1 AND r2.b2 = r3.a2
        |        JOIN r4 ON r3.b1 = r4.a1 AND r3.b2 = r4.a2
        |        JOIN r5 ON r4.b1 = r5.a1 AND r4.b2 = r5.a2
        |WHERE CAST(r1.a1 AS BIGINT) BETWEEN 3 AND 5
        |  AND CAST(r1.a2 AS BIGINT) BETWEEN 8 AND 12""".stripMargin,
      "r1" -> p.steps(0).relation, "r2" -> p.steps(1).relation,
      "r3" -> p.steps(2).relation, "r4" -> p.steps(3).relation,
      "r5" -> p.steps(4).relation,
    )
  }

  test("relational pipeline shapes are consistent with its lineage") {
    val p = Workflows.relationalPipeline(spark, nBasics = 300)
    assert(p.steps.size == 5)
    val log = ingest(p)
    // forward from the first two basics rows through the whole pipeline
    val t0Cols = p.arrays.head._2(1)
    val res = log.provQuery(p.path,
      Seq(Vector(Interval(0, 1), Interval(0, t0Cols - 1))))
    val cells = ThetaJoin.cellSet(res)
    val (rows, cols) = (p.arrays.last._2(0), p.arrays.last._2(1))
    cells.foreach { c =>
      assert(c(0) >= 0 && c(0) < rows)
      assert(c(1) >= 0 && c(1) < cols)
    }
  }

  test("relational pipeline backward query reaches only source rows that joined") {
    val p = Workflows.relationalPipeline(spark, nBasics = 300)
    val log = ingest(p)
    val res = log.provQuery(p.path.reverse,
      Seq(Vector(Interval(0, 0), Interval(0, 0))))
    // Backward from one final cell must land inside t0.
    val cells = ThetaJoin.cellSet(res)
    assert(cells.nonEmpty)
    cells.foreach(c => assert(c(0) >= 0 && c(0) < 300 && c(1) >= 0 && c(1) < 4))
  }

  test("resnet block pipeline has 7 steps and supports forward queries") {
    val p = Workflows.resnetBlock(spark, c = 4, h = 8, w = 8)
    assert(p.steps.size == 7)
    val log = ingest(p)
    val res = log.provQuery(p.path,
      Seq(Vector(Interval(0, 0), Interval(3, 3), Interval(3, 3))))
    val cells = ThetaJoin.cellSet(res)
    assert(cells.nonEmpty)
    // two 3x3 convs: spatial receptive field is +-2 around (3,3), all channels
    cells.foreach { c =>
      assert(c(1) >= 1 && c(1) <= 5)
      assert(c(2) >= 1 && c(2) <= 5)
    }
  }

  test("random pipelines are reproducible and respect shape flow") {
    val p1 = Workflows.randomPipeline(spark, nOps = 5, cells = 500, seed = 7)
    val p2 = Workflows.randomPipeline(spark, nOps = 5, cells = 500, seed = 7)
    assert(p1.name == p2.name)
    assert(p1.arrays.map(_._2) == p2.arrays.map(_._2))
    p1.steps.zip(p1.arrays.sliding(2).toSeq).foreach { case (s, Seq((_, fromShape), (_, toShape))) =>
      val nTo = toShape.size
      val cols = s.relation.columns
      assert(cols.length == fromShape.size + nTo)
    }
  }

  test("random pipeline end-to-end query matches the relational join (oracle)") {
    val p = Workflows.randomPipeline(spark, nOps = 3, cells = 200, seed = 13)
    val log = ingest(p)
    val res = log.provQuery(p.path, Seq(Vector(Interval(10, 29))))
    val resDf = QueryProcessor.rectsToDf(spark, res, Seq("c1"))
    Oracle.assertEquivalent(
      resDf,
      """SELECT DISTINCT r3.b1 AS c1
        |FROM r1 JOIN r2 ON r1.b1 = r2.a1 JOIN r3 ON r2.b1 = r3.a1
        |WHERE CAST(r1.a1 AS BIGINT) BETWEEN 10 AND 29""".stripMargin,
      "r1" -> p.steps(0).relation, "r2" -> p.steps(1).relation,
      "r3" -> p.steps(2).relation,
    )
  }
}
