package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table IX: coverage of ProvRC compression and automatic reuse
  * prediction over the 136-operation catalog, 20 runs per operation.
  */
class TableIXBench extends AnyFunSuite {

  test("Table IX: coverage of compression and reuse over the op catalog") {
    val rows = Benchmarks.runTableIX(runs = 20)
    val byCat = rows.map(r => r.category -> r).toMap

    val el = byCat("element")
    assert(el.total == 75)
    assert(el.provrc == 75, "all element ops compress")
    assert(el.dimSig == 75, "all element ops are shape-reusable")
    assert(el.genSig == 75, "all element ops are generally reusable")
    assert(el.errors == 0)

    val cx = byCat("complex")
    assert(cx.total == 61)
    assert(cx.provrc >= 48 && cx.provrc <= 58, s"complex compression coverage ${cx.provrc}")
    assert(cx.dimSig >= 45 && cx.dimSig <= 55, s"complex dim coverage ${cx.dimSig}")
    assert(cx.genSig >= 18 && cx.genSig <= 34, s"complex gen coverage ${cx.genSig}")
    assert(cx.errors == 1, s"exactly the cross misprediction, got ${cx.errors}")

    val tot = byCat("total")
    assert(tot.total == 136)
    assert(tot.provrc == el.provrc + cx.provrc)
  }
}
