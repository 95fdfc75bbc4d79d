package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.arrays.{NDArray, Ops}
import repro.provrc.ProvRC

class ReuseManagerSpec extends AnyFunSuite {

  private def capture(op: repro.arrays.ArrayOp, k: Int, seed: Long) = {
    val ins = op.makeInputs(k, seed)
    val tables = op.lineage(ins).map(r =>
      ProvRC.compress(r.rows.iterator, r.nOut, r.nIn))
    (ins.map(_.shape), tables)
  }

  private def register(rm: ReuseManager, op: repro.arrays.ArrayOp, k: Int, seed: Long) = {
    val (shapes, tables) = capture(op, k, seed)
    rm.register(op.name, op.argsKey, shapes, tables)
  }

  test("elementwise op gains dim_sig after two matching calls (m = 1)") {
    val rm = new ReuseManager
    val op = Ops.elementOps.head
    assert(register(rm, op, 0, 1) == ((false, false)))
    assert(register(rm, op, 0, 2) == ((false, false))) // confirms, not yet served
    assert(register(rm, op, 0, 3)._1, "third call should hit dim_sig")
    assert(rm.dimCovered(op.name))
  }

  test("elementwise op gains gen_sig across different shapes") {
    val rm = new ReuseManager
    val op = Ops.elementOps.head
    register(rm, op, 0, 1)
    register(rm, op, 1, 2) // different shape confirms generalization
    val (_, genHit) = register(rm, op, 2, 3)
    assert(genHit, "third call with a third shape should hit gen_sig")
    assert(rm.genCovered(op.name))
  }

  test("aggregate (sum) is dim- and gen-reusable") {
    val rm = new ReuseManager
    val op = Ops.complexOps.find(_.name == "sum").get
    register(rm, op, 0, 1); register(rm, op, 0, 2)
    register(rm, op, 1, 3)
    assert(register(rm, op, 2, 4)._2)
    assert(rm.dimCovered(op.name) && rm.genCovered(op.name))
  }

  test("matmul generalizes over all three dimensions") {
    val rm = new ReuseManager
    val op = Ops.complexOps.find(_.name == "matmul").get
    register(rm, op, 0, 1)
    register(rm, op, 1, 2)
    assert(register(rm, op, 2, 3)._2)
    assert(rm.genCovered(op.name))
  }

  test("sort is not reusable at any level (value-dependent)") {
    val rm = new ReuseManager
    val op = Ops.complexOps.find(_.name == "sort").get
    register(rm, op, 0, 1)
    register(rm, op, 0, 2) // same shape, different values -> different lineage
    register(rm, op, 0, 3)
    assert(!rm.dimCovered(op.name))
    assert(!rm.genCovered(op.name))
    assert(rm.errors == 0, "failed confirmation is not a misprediction")
  }

  test("roll has dim_sig but no gen_sig (wrap block depends on n)") {
    val rm = new ReuseManager
    val op = Ops.complexOps.find(_.name == "roll").get
    register(rm, op, 0, 1); register(rm, op, 0, 2)
    register(rm, op, 1, 3)
    register(rm, op, 2, 4)
    assert(rm.dimCovered(op.name))
    assert(!rm.genCovered(op.name))
  }

  test("cumsum has dim_sig but no gen_sig (prefix intervals are not full extents)") {
    val rm = new ReuseManager
    val op = Ops.complexOps.find(_.name == "cumsum").get
    register(rm, op, 0, 1); register(rm, op, 0, 2)
    register(rm, op, 1, 3); register(rm, op, 2, 4)
    assert(rm.dimCovered(op.name))
    assert(!rm.genCovered(op.name))
  }

  test("cross reproduces the paper's single gen_sig misprediction") {
    val rm = new ReuseManager
    val op = Ops.complexOps.find(_.name == "cross").get
    register(rm, op, 0, 1)  // (4,3) vectors
    register(rm, op, 0, 5)  // same shapes -> dim_sig confirmed
    register(rm, op, 1, 2)  // (5,3) -> gen_sig confirmed
    register(rm, op, 2, 3)  // (6,3) -> served correctly
    assert(rm.errors == 0)
    register(rm, op, 15, 4) // (19,2): different lineage pattern -> misprediction
    assert(rm.errors == 1)
    assert(!rm.genCovered(op.name))
    assert(rm.dimCovered(op.name), "dim_sig is unaffected by the gen error")
  }

  test("dim_sig mispredictions are tracked separately") {
    // Craft an op-like registration where the same shapes give identical
    // lineage twice and then a different one (simulating hidden value
    // dependence surfacing late).
    val rm = new ReuseManager
    val op = Ops.complexOps.find(_.name == "trim_zeros").get
    // seeds with equal leading-zero counts confirm; a different count breaks
    val (s1, t1) = {
      val ins = op.makeInputs(0, 4) // 4 % 4 = 0 leading zeros
      (ins.map(_.shape), op.lineage(ins).map(r => ProvRC.compress(r.rows.iterator, r.nOut, r.nIn)))
    }
    rm.register(op.name, op.argsKey, s1, t1)
    rm.register(op.name, op.argsKey, s1, t1)
    val ins2 = op.makeInputs(0, 6) // 6 % 4 = 2 leading zeros -> shifted lineage
    val t2 = op.lineage(ins2).map(r => ProvRC.compress(r.rows.iterator, r.nOut, r.nIn))
    rm.register(op.name, op.argsKey, ins2.map(_.shape), t2)
    assert(rm.errors == 1)
    assert(!rm.dimCovered(op.name))
  }
}
