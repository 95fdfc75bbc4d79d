package repro.bench

import repro.SparkSpec
import repro.workflows.Workflows

/** Reproduces the random numpy-pipeline latency experiment (the data
  * behind Fig 9): randomly generated 5-op and 10-op chains over a
  * 100 000-cell array, forward-queried at several selectivities, with the
  * Raw and DSLog-NoMerge ablations included for the 5-op runs as in the
  * paper. Tune with RANDOM_WF / RANDOM_CELLS.
  */
class RandomPipelineBench extends SparkSpec {

  private val cells = sys.env.getOrElse("RANDOM_CELLS", "100000").toInt
  private val nWf5 = sys.env.getOrElse("RANDOM_WF", "4").toInt
  private val selectivities = Seq(0.001, 0.01, 0.1)

  private def run(nOps: Int, nWf: Int, formats: Seq[String], noMerge: Boolean) = {
    val rows = (0 until nWf).flatMap { i =>
      val p = Workflows.randomPipeline(spark, nOps, cells, seed = 100 + i)
      println(s"workflow: ${p.name}")
      val stored = Benchmarks.ingestAndStore(spark, p, formats)
      selectivities.flatMap(sel =>
        Benchmarks.queryAllMethods(spark, stored, sel, includeNoMerge = noMerge)
          .map(r => r.copy(workflow = s"rand$nOps-$i")))
    }
    Benchmarks.printLatencyRows(s"Fig 9: random $nOps-op pipelines", rows)

    println(s"\n--- Fig 9 summary ($nOps ops): avg/min/max latency (ms) per method ---")
    for (sel <- selectivities; m <- rows.map(_.method).distinct) {
      val ms = rows.filter(r => r.method == m && r.selectivity == sel).map(_.millis)
      println(f"sel=$sel%-8s $m%-15s avg=${ms.sum / ms.size}%10.1f min=${ms.min}%10.1f max=${ms.max}%10.1f")
    }
    rows
  }

  test("Fig 9A: five-operation random pipelines") {
    val rows = run(5, nWf5,
      Seq("Raw", "Array", "Parquet", "Parquet-GZip", "Turbo-RC"), noMerge = true)
    // DSLog should be at least competitive with the best baseline on average
    // at the largest selectivity (paper: up to 20x better).
    val atMax = rows.filter(_.selectivity == selectivities.max)
    def avg(m: String) = {
      val xs = atMax.filter(_.method == m).map(_.millis); xs.sum / xs.size
    }
    Seq("Parquet", "Parquet-GZip", "Turbo-RC", "Raw").foreach { m =>
      assert(avg("DSLog") < avg(m), s"DSLog should beat $m on average")
    }
    // DSLog-NoMerge must cover the same cells; at sub-millisecond latencies
    // the merge step is fixed overhead, so only sanity-bound it.
    assert(avg("DSLog") <= avg("DSLog-NoMerge") + 50.0)
  }

  test("Fig 9B: ten-operation random pipelines") {
    val rows = run(10, math.max(1, nWf5 / 2),
      Seq("Parquet", "Parquet-GZip", "Turbo-RC"), noMerge = false)
    val atMax = rows.filter(_.selectivity == selectivities.max)
    def avg(m: String) = {
      val xs = atMax.filter(_.method == m).map(_.millis); xs.sum / xs.size
    }
    Seq("Parquet", "Parquet-GZip").foreach { m =>
      assert(avg("DSLog") < avg(m), s"DSLog should beat $m on average")
    }
  }
}
