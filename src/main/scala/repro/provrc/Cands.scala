package repro.provrc

/** Candidate encodings for one input attribute of a partially compressed
  * lineage row — the working representation behind both steps of ProvRC.
  *
  * `abs` is the absolute interval (if still exact); `rels(j)`, when defined,
  * means `a ∈ [b_j + rels(j).lo, b_j + rels(j).hi]` for every output cell
  * `b` of the row. This is the paper's set `{a_i, a_i b_1, … a_i b_l}`: any
  * single defined component fully determines the attribute's value set, so
  * merges only need to keep the components that remain exact.
  */
final case class Cands(abs: Option[Interval], rels: Vector[Option[Interval]]) {

  /** At least one component left — the row still encodes this attribute. */
  def defined: Boolean = abs.isDefined || rels.exists(_.isDefined)

  /** Components equal in both rows — the merge rule when combining rows
    * across an *output* axis (the attribute's value function must be
    * identical on both sides).
    */
  def equalComponents(o: Cands): Cands = Cands(
    if (abs.isDefined && abs == o.abs) abs else None,
    rels.lazyZip(o.rels).map { (x, y) =>
      if (x.isDefined && x == y) x else None
    }.toVector,
  )

  /** Component-wise interval union — the merge rule when combining rows
    * along *this* input axis (outputs and the other attributes being equal,
    * the merged row's value set is the union; a component survives only if
    * its union is a single interval).
    */
  def unionComponents(o: Cands): Cands = {
    def u(x: Option[Interval], y: Option[Interval]): Option[Interval] = (x, y) match {
      case (Some(a), Some(b)) if a.mergeable(b) => Some(a.union(b))
      case _                                    => None
    }
    Cands(u(abs, o.abs), rels.lazyZip(o.rels).map(u).toVector)
  }
}

object Cands {
  def absOnly(iv: Interval, nOut: Int): Cands =
    Cands(Some(iv), Vector.fill(nOut)(None))
}
