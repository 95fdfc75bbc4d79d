package repro.core

import repro.provrc._
import scala.collection.mutable

/** Lineage reuse with automatic prediction (paper Section VI).
  *
  * Operation signatures map to stored lineage tables at three levels:
  * `base_sig` (exact input arrays — subsumed here by dim_sig since our
  * captures are deterministic in the inputs), `dim_sig` (input *shapes*),
  * and `gen_sig` (shape-independent, via index reshaping).
  *
  * Automatic prediction with m = 1 (paper §VI-C): the first call stores a
  * temporary mapping; if the next call matching the partial signature
  * reproduces the stored lineage (for gen_sig: after index reshaping to the
  * new shapes, which must differ from the first call's), the mapping is
  * made permanent, else it is marked not reusable. A permanent mapping that
  * later disagrees with freshly captured lineage is a misprediction — the
  * paper observed exactly one (`cross`).
  */
final class ReuseManager {

  /** One captured call: input shapes and the per-input compressed lineage
    * tables (backward orientation).
    */
  final case class CallCapture(shapes: Seq[Vector[Int]], tables: Seq[Vector[CRow]])

  private sealed trait State
  private final case class Pending(first: CallCapture) extends State
  private final case class DimPermanent(tables: Seq[Vector[CRow]]) extends State
  private final case class GenPermanent(gen: Seq[Vector[Reshape.GRow]]) extends State
  private case object NotReusable extends State

  private val dimStates = mutable.Map.empty[(String, String, Seq[Vector[Int]]), State]
  private val genStates = mutable.Map.empty[(String, String), State]
  private val dimCoveredOps = mutable.Set.empty[String]
  private val genCoveredOps = mutable.Set.empty[String]
  private val dimErrorOps = mutable.Map.empty[String, Int].withDefaultValue(0)
  private val genErrorOps = mutable.Map.empty[String, Int].withDefaultValue(0)

  def errors: Int = dimErrorOps.values.sum + genErrorOps.values.sum
  def errorsFor(op: String): Int = dimErrorOps(op) + genErrorOps(op)
  def dimCovered(op: String): Boolean = dimCoveredOps(op) && dimErrorOps(op) == 0
  def genCovered(op: String): Boolean = genCoveredOps(op) && genErrorOps(op) == 0

  /** Named dimensions of a shape tuple — `d<arrayIdx>_<axisIdx>`. */
  private def dims(shapes: Seq[Vector[Int]]): Seq[(String, Long)] =
    shapes.zipWithIndex.flatMap { case (s, ai) =>
      s.zipWithIndex.map { case (e, ax) => (s"d${ai}_$ax", e.toLong) }
    }

  /** Lineage equality up to representation: same arities and same
    * decompressed cell-pair sets per input table.
    */
  private def sameLineage(a: Seq[Vector[CRow]], b: Seq[Vector[CRow]]): Boolean =
    a.size == b.size && a.lazyZip(b).forall { (x, y) =>
      (x.isEmpty && y.isEmpty) ||
        (x.nonEmpty && y.nonEmpty &&
          x.head.nOut == y.head.nOut && x.head.nIn == y.head.nIn &&
          ProvRC.decompress(x).map(_.toVector).toSet ==
            ProvRC.decompress(y).map(_.toVector).toSet)
    }

  /** Record a captured call and run the m = 1 prediction state machine.
    * Returns `(dimHit, genHit)` — whether each signature level served this
    * call from a permanent mapping.
    */
  def register(
      op: String,
      argsKey: String,
      shapes: Seq[Vector[Int]],
      tables: Seq[Vector[CRow]],
  ): (Boolean, Boolean) = {
    val capture = CallCapture(shapes, tables)
    val dimKey = (op, argsKey, shapes)
    var dimHit = false
    dimStates.get(dimKey) match {
      case None => dimStates(dimKey) = Pending(capture)
      case Some(Pending(first)) =>
        if (sameLineage(first.tables, tables)) {
          dimStates(dimKey) = DimPermanent(first.tables)
          dimCoveredOps += op
        } else dimStates(dimKey) = NotReusable
      case Some(DimPermanent(stored)) =>
        if (sameLineage(stored, tables)) dimHit = true
        else {
          dimErrorOps(op) = dimErrorOps(op) + 1
          dimStates(dimKey) = NotReusable
        }
      case Some(_) => ()
    }

    val genKey = (op, argsKey)
    var genHit = false
    genStates.get(genKey) match {
      case None => genStates(genKey) = Pending(capture)
      case Some(Pending(first)) =>
        // gen_sig confirmation requires a call with *different* shapes.
        if (shapes != first.shapes) {
          val gen = first.tables.map(t => Reshape.generalize(t, dims(first.shapes)))
          val predicted =
            try Some(gen.map(g => Reshape.instantiate(g, dims(shapes).toMap)))
            catch { case _: Exception => None }
          if (predicted.exists(sameLineage(_, tables))) {
            genStates(genKey) = GenPermanent(gen)
            genCoveredOps += op
          } else genStates(genKey) = NotReusable
        }
      case Some(GenPermanent(gen)) =>
        val predicted =
          try Some(gen.map(g => Reshape.instantiate(g, dims(shapes).toMap)))
          catch { case _: Exception => None }
        if (predicted.exists(sameLineage(_, tables))) genHit = true
        else {
          genErrorOps(op) = genErrorOps(op) + 1
          genStates(genKey) = NotReusable
        }
      case Some(_) => ()
    }
    (dimHit, genHit)
  }
}
