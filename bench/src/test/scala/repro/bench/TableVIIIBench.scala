package repro.bench

import repro.SparkSpec
import repro.workflows.Workflows

/** Reproduces the query-latency evaluation over the Table VIII workflows
  * (the data behind Fig 8): the 5-step image pipeline, the 5-step
  * relational pipeline, and the 7-step ResNet block, each queried forward
  * at several selectivities with DSLog and every baseline.
  */
class TableVIIIBench extends SparkSpec {

  private val formats = Seq("Raw", "Array", "Parquet", "Parquet-GZip", "Turbo-RC")
  private val selectivities = Seq(0.0001, 0.001, 0.01, 0.1)

  test("Fig 8: query latency over image, relational and ResNet workflows") {
    val pipelines = Seq(
      Workflows.imagePipeline(spark, src = 256, n = 128),
      Workflows.relationalPipeline(spark, nBasics = 6000),
      Workflows.resnetBlock(spark, c = 8, h = 16, w = 16),
    )
    println("\n=== Table VIII: workflow definitions ===")
    pipelines.foreach(p => println(s"${p.name}: ${p.steps.map(s => s"${s.from}->${s.to}").mkString(", ")}"))

    val all = pipelines.flatMap { p =>
      val stored = Benchmarks.ingestAndStore(spark, p, formats)
      selectivities.flatMap(sel => Benchmarks.queryAllMethods(spark, stored, sel))
    }
    Benchmarks.printLatencyRows("Fig 8: workflow query latency", all)

    // Shape assertion: DSLog beats the relational-join baselines at the
    // least selective query on every workflow (paper's headline).
    for (wf <- all.map(_.workflow).distinct) {
      val atMax = all.filter(r => r.workflow == wf && r.selectivity == selectivities.max)
      val dslog = atMax.find(_.method == "DSLog").get.millis
      Seq("Parquet", "Parquet-GZip", "Turbo-RC").foreach { m =>
        val base = atMax.find(_.method == m).get.millis
        assert(dslog < base, f"$wf: DSLog ($dslog%.0f ms) should beat $m ($base%.0f ms)")
      }
    }
  }
}
