package repro.arrays

import org.scalatest.funsuite.AnyFunSuite

/** Sanity and semantics checks over the full 136-operation catalog. */
class OpsSpec extends AnyFunSuite {

  test("catalog has the paper's population: 75 element + 61 complex = 136") {
    assert(Ops.elementOps.size == 75)
    assert(Ops.complexOps.size == 61)
    assert(Ops.all.size == 136)
    assert(Ops.all.map(o => (o.name, o.argsKey)).distinct.size == 136, "duplicate op signatures")
  }

  test("every op runs and captures well-formed lineage at two size variants") {
    for (op <- Ops.all; k <- Seq(0, 1)) {
      val ins = op.makeInputs(k, seed = 42 + k)
      assert(ins.size == op.arity, s"${op.name}: arity")
      val out = op.apply(ins)
      val rels = op.lineage(ins)
      assert(rels.size == op.arity, s"${op.name}: one relation per input")
      rels.zip(ins).foreach { case (r, in) =>
        assert(r.nOut == out.ndim, s"${op.name}: out arity")
        assert(r.nIn == in.ndim, s"${op.name}: in arity")
        assert(r.rows.nonEmpty, s"${op.name}: empty lineage")
        assert(r.rows.map(_.toVector).distinct.size == r.rows.size, s"${op.name}: dup rows")
        r.rows.foreach { row =>
          out.shape.indices.foreach(d =>
            assert(row(d) >= 0 && row(d) < out.shape(d), s"${op.name}: out idx oob"))
          in.shape.indices.foreach(d =>
            assert(row(r.nOut + d) >= 0 && row(r.nOut + d) < in.shape(d),
              s"${op.name}: in idx oob"))
        }
      }
    }
  }

  test("element ops capture identity lineage") {
    for (op <- Ops.elementOps.take(10)) {
      val ins = op.makeInputs(0, 7)
      val rels = op.lineage(ins)
      rels.foreach(r => r.rows.foreach(row => assert(row(0) == row(1), op.name)))
    }
  }

  test("matmul computes the product and captures row/column lineage") {
    val op = Ops.complexOps.find(_.name == "matmul").get
    val a = new NDArray(Vector(2, 2), Array(1, 2, 3, 4))
    val b = new NDArray(Vector(2, 2), Array(5, 6, 7, 8))
    val out = op.apply(Seq(a, b))
    assert(out.data.toSeq == Seq(19.0, 22.0, 43.0, 50.0))
    val Seq(la, lb) = op.lineage(Seq(a, b))
    // C(0,0) <- A(0,0), A(0,1)
    assert(la.rows.map(_.toVector).toSet.contains(Vector(0L, 0L, 0L, 1L)))
    assert(lb.rows.map(_.toVector).toSet.contains(Vector(0L, 0L, 1L, 0L)))
  }

  test("sort lineage is the value permutation") {
    val op = Ops.complexOps.find(_.name == "sort").get
    val a = NDArray.of(3.0, 1.0, 2.0)
    val Seq(r) = op.lineage(Seq(a))
    assert(r.rows.map(_.toVector).toSet ==
      Set(Vector(0L, 1L), Vector(1L, 2L), Vector(2L, 0L)))
    assert(op.apply(Seq(a)).data.toSeq == Seq(1.0, 2.0, 3.0))
  }

  test("trim_zeros lineage is a constant shift past leading zeros") {
    val op = Ops.complexOps.find(_.name == "trim_zeros").get
    val a = NDArray.of(0.0, 0.0, 5.0, 6.0)
    val Seq(r) = op.lineage(Seq(a))
    assert(r.rows.map(_.toVector) == Vector(Vector(0L, 2L), Vector(1L, 3L)))
  }

  test("cumsum lineage is the full prefix") {
    val op = Ops.complexOps.find(_.name == "cumsum").get
    val a = NDArray.of(1.0, 2.0, 3.0)
    val Seq(r) = op.lineage(Seq(a))
    assert(r.rows.map(_.toVector).toSet ==
      Set(Vector(0L, 0L), Vector(1L, 0L), Vector(1L, 1L),
          Vector(2L, 0L), Vector(2L, 1L), Vector(2L, 2L)))
    assert(op.apply(Seq(a)).data.toSeq == Seq(1.0, 3.0, 6.0))
  }

  test("cross switches lineage pattern between 3-vectors and 2-vectors") {
    val op = Ops.complexOps.find(_.name == "cross").get
    val ins3 = op.makeInputs(0, 1)
    val ins2 = op.makeInputs(15, 1)
    assert(op.lineage(ins3).head.nOut == 2)
    assert(op.lineage(ins2).head.nOut == 1)
    // 3-vector: component c never contributes to itself
    op.lineage(ins3).head.rows.foreach(row => assert(row(1) != row(3)))
  }

  test("median lineage selects one or two source cells") {
    val op = Ops.complexOps.find(_.name == "median").get
    val a = NDArray.of(5.0, 1.0, 3.0)
    val Seq(r) = op.lineage(Seq(a))
    assert(r.rows.map(_.toVector) == Vector(Vector(0L, 2L))) // 3.0 at index 2
    assert(op.apply(Seq(a)).data.toSeq == Seq(3.0))
  }

  test("transpose apply matches lineage mapping") {
    val op = Ops.complexOps.find(_.name == "transpose").get
    val a = new NDArray(Vector(2, 3), Array(1, 2, 3, 4, 5, 6))
    val out = op.apply(Seq(a))
    assert(out.shape == Vector(3, 2))
    assert(out(1, 0) == a(0, 1))
    assert(out(2, 1) == a(1, 2))
  }

  test("convolve lineage covers the sliding windows of both inputs") {
    val op = Ops.complexOps.find(_.name == "convolve").get
    val a = NDArray.of(1.0, 2.0, 3.0)
    val b = NDArray.of(1.0, 1.0)
    val Seq(la, lb) = op.lineage(Seq(a, b))
    assert(op.apply(Seq(a, b)).data.toSeq == Seq(1.0, 3.0, 5.0, 3.0))
    assert(la.rows.map(_.toVector).toSet ==
      Set(Vector(0L, 0L), Vector(1L, 0L), Vector(1L, 1L), Vector(2L, 1L),
          Vector(2L, 2L), Vector(3L, 2L)))
    assert(lb.rows.size == 6)
  }

  test("pipeline pool ops all map one float array to one float array") {
    assert(Ops.pipelinePool.nonEmpty)
    Ops.pipelinePool.foreach { op =>
      assert(op.arity == 1, op.name)
      val out = op.apply(op.makeInputs(0, 3))
      assert(out.ndim == 1, op.name)
    }
  }
}
