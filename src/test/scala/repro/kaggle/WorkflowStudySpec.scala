package repro.kaggle

import org.scalatest.funsuite.AnyFunSuite

class WorkflowStudySpec extends AnyFunSuite {
  import WorkflowStudy._

  test("structured op kinds are measured compressible") {
    Seq("fillna", "scale", "aggregate", "rolling_mean", "matmul_fit",
        "drop_columns", "head", "concat_rows", "merge_sorted").foreach { n =>
      val k = kinds.find(_.name == n).get
      assert(isCompressible(k, 5), s"$n should compress")
    }
  }

  test("value filters and reorderings are measured incompressible") {
    Seq("value_filter", "sort_values", "drop_duplicates", "sample",
        "groupby_unsorted").foreach { n =>
      val k = kinds.find(_.name == n).get
      assert(!isCompressible(k, 5), s"$n should not compress")
    }
  }

  test("traces are reproducible in the seed") {
    assert(generate("flight", 4) == generate("flight", 4))
    assert(generate("flight", 4) != generate("flight", 5))
  }

  test("trace invariants: chain bounded by op count, compressible bounded by ops") {
    for (seed <- 0 until 10; d <- Seq("flight", "netflix")) {
      val t = generate(d, seed)
      assert(t.ops.size >= 5)
      assert(t.longestChain >= 1 && t.longestChain <= t.ops.size)
      assert(t.compressible >= 0 && t.compressible <= t.ops.size)
    }
  }

  test("study output has three rows in the paper's regime") {
    val rows = study(perDataset = 10, seed = 1)
    assert(rows.map(_.dataset) == Seq("Flight", "Netflix", "Total"))
    rows.foreach { r =>
      assert(r.meanOps > 10 && r.meanOps < 150, s"${r.dataset}: ${r.meanOps}")
      assert(r.meanPct > 40 && r.meanPct < 95, s"${r.dataset}: ${r.meanPct}")
      assert(r.meanChain >= 2 && r.meanChain < 60)
    }
  }
}
