package repro.provrc

/** Final encoding of one input attribute in a compressed lineage row. */
sealed trait InEnc {
  /** Absolute index interval for a given output cell `b` (only the axis the
    * encoding references is read).
    */
  def resolve(b: IndexedSeq[Long]): Interval = this match {
    case AbsEnc(iv)      => iv
    case RelEnc(j, d)    => d.shift(b(j))
  }
}

/** Pattern (1)/(2): the input attribute is an absolute interval. */
final case class AbsEnc(iv: Interval) extends InEnc

/** Pattern (3): the input attribute is relative to output axis `outAxis`:
  * `a ∈ [b_j + delta.lo, b_j + delta.hi]` for every output cell `b` covered
  * by the row (the paper's `a_i b_j` column, delta convention `a − b`
  * following the paper's worked example in Table II).
  */
final case class RelEnc(outAxis: Int, delta: Interval) extends InEnc

/** One row of a ProvRC-compressed lineage table.
  *
  * Semantics: for every output cell `b` in the Cartesian product of `out`,
  * the related input cells are the Cartesian product over `in` of each
  * encoding resolved at `b`. Within one row the relationship is all-to-all
  * (in relative space for `RelEnc` attributes), which is what makes the
  * in-situ range join of Section V sound.
  */
final case class CRow(out: Vector[Interval], in: Vector[InEnc]) {
  def nOut: Int = out.size
  def nIn: Int = in.size

  /** Number of output cells covered (product of interval lengths). */
  def outCells: Long = out.foldLeft(1L)(_ * _.len)
}
