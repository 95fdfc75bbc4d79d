package repro.provrc

/** Closed integer interval `[lo, hi]` over 0-based array indices.
  *
  * ProvRC's multi-attribute range encoding represents every attribute of a
  * compressed lineage row as one such interval (a point is `[v, v]`).
  * Relative attributes reuse the same type for delta intervals, which may
  * be negative.
  */
final case class Interval(lo: Long, hi: Long) {
  require(lo <= hi, s"bad interval [$lo,$hi]")

  def len: Long = hi - lo + 1

  def contains(v: Long): Boolean = v >= lo && v <= hi

  def containsAll(o: Interval): Boolean = lo <= o.lo && o.hi <= hi

  def intersect(o: Interval): Option[Interval] = {
    val l = math.max(lo, o.lo); val h = math.min(hi, o.hi)
    if (l <= h) Some(Interval(l, h)) else None
  }

  /** Minkowski sum — used by `rel_back`: absolute = key interval + delta. */
  def plus(o: Interval): Interval = Interval(lo + o.lo, hi + o.hi)

  def shift(d: Long): Interval = Interval(lo + d, hi + d)

  /** True when the union with `o` is itself a single interval (overlap or
    * adjacency) — the merge precondition of range encoding.
    */
  def mergeable(o: Interval): Boolean =
    math.max(lo, o.lo) <= math.min(hi, o.hi) + 1

  def union(o: Interval): Interval =
    Interval(math.min(lo, o.lo), math.max(hi, o.hi))
}

object Interval {
  def point(v: Long): Interval = Interval(v, v)
}
