package repro.core

import repro.SparkSpec
import repro.arrays.LineageGen
import repro.provrc._

class QueryProcessorSpec extends SparkSpec {
  import ThetaJoin.Rect

  private def rect(ivs: Interval*): Rect = ivs.toVector

  test("rectPredicate builds a disjunction of per-axis conjunctions") {
    val df = LineageGen.elementwise(spark, Seq(100L))
    val pred = QueryProcessor.rectPredicate(Seq("b1"),
      Seq(rect(Interval(0, 4)), rect(Interval(90, 94))))
    assert(df.filter(pred).count() == 10)
  }

  test("rectPredicate over two axes") {
    val df = LineageGen.elementwise(spark, Seq(10L, 10L))
    val pred = QueryProcessor.rectPredicate(Seq("b1", "b2"),
      Seq(rect(Interval(0, 1), Interval(0, 4))))
    assert(df.filter(pred).count() == 10)
  }

  test("rectsToDf expands rectangles into distinct cells") {
    val df = QueryProcessor.rectsToDf(spark,
      Seq(rect(Interval(0, 2)), rect(Interval(2, 3))), Seq("c1"))
    assert(df.collect().map(_.getLong(0)).sorted.toSeq == Seq(0L, 1L, 2L, 3L))
  }

  test("insitu with empty query short-circuits to empty") {
    val t = ProvRC.compress(Iterator(Array(0L, 0L)), 1, 1)
    assert(QueryProcessor.insitu(spark, Seq(t, t), Nil).isEmpty)
  }

  test("joinChain single hop equals a filtered projection") {
    val df = LineageGen.flipH(spark, 1L, 50L).select("b2", "a2")
    val fwd = df.select("a2", "b2")
    val res = QueryProcessor.joinChain(Seq((fwd, 1)), Seq(rect(Interval(0, 9))))
      .collect().map(_.getLong(0)).toSet
    assert(res == (40L to 49L).toSet)
  }

  test("arrayScanChain on two hops with fan-out") {
    // hop1: b -> {b}, hop2: aggregate pairs c = b / 2
    val h1 = Array(Array(0L, 1L, 2L, 3L), Array(0L, 1L, 2L, 3L))
    val h2 = Array(Array(0L, 1L, 2L, 3L), Array(0L, 0L, 1L, 1L))
    val res = QueryProcessor.arrayScanChain(
      Seq((h1, 1), (h2, 1)), Seq(rect(Interval(1, 2))))
    assert(res == Set(Vector(0L), Vector(1L)))
  }

  test("spark hop threshold is respected (small tables run on the driver)") {
    val t = ProvRC.compress((0L until 100L).map(i => Array(i, i)).iterator, 1, 1)
    val res = QueryProcessor.insitu(spark, Seq(t), Seq(rect(Interval(5, 9))))
    assert(res == Vector(Vector(Interval(5, 9))))
  }
}
