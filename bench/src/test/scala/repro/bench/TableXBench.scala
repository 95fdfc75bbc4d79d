package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table X: the qualitative estimate of compressible operations
  * and longest operation chains over (synthetic) data-science workflows.
  */
class TableXBench extends AnyFunSuite {

  test("Table X: compressible operations and longest chains") {
    val rows = Benchmarks.runTableX(perDataset = 10)
    val byName = rows.map(r => r.dataset -> r).toMap

    // Paper's regime: Flight 76.3±11.0 %, Netflix 66.9±9.2 %, chains 15.3±11.1.
    val flight = byName("Flight"); val netflix = byName("Netflix"); val total = byName("Total")
    assert(flight.meanPct > netflix.meanPct,
      "Flight (more ML-heavy) should have higher compressible coverage")
    assert(total.meanPct > 55 && total.meanPct < 90, s"total coverage ${total.meanPct}")
    assert(total.meanOps > 25 && total.meanOps < 110, s"total ops ${total.meanOps}")
    assert(total.meanChain > 5 && total.meanChain < 40, s"chains ${total.meanChain}")
  }
}
