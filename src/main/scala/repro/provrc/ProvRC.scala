package repro.provrc

import scala.collection.mutable.ArrayBuffer

/** The ProvRC lossless lineage-compression algorithm (paper Section IV).
  *
  * A lineage relation `R(b_1..b_l, a_1..a_m)` maps output cells to the input
  * cells that contributed to them. ProvRC compresses it with two
  * subroutines:
  *
  *  1. multi-attribute range encoding over the input attributes (merge rows
  *     whose other attributes agree and whose `a_i` values form a contiguous
  *     run into one interval row);
  *  2. relative value transformation (`a_i b_j = a_i − b_j`) followed by
  *     range encoding over the output attributes, keeping for each input
  *     attribute whichever components (absolute and/or relative) stay exact.
  *
  * We implement both steps in one candidate-set framework ([[Cands]]): every
  * input attribute carries its absolute interval plus delta intervals
  * against every output axis, and per-axis sorted scan-merges discard
  * components that would stop being exact. This subsumes the paper's two
  * steps and doubles as the boundary re-merge after per-partition
  * compression on Spark (the paper notes ProvRC is highly parallelizable).
  *
  * All merges preserve the exact set of (output cell, input cell) pairs, so
  * `decompress(compress(R)) == R` for any relation with set semantics —
  * the paper's losslessness claim (Section IV-B), checked by property tests.
  */
object ProvRC {

  /** Working row: output intervals + candidate sets per input attribute. */
  final case class WRow(out: Vector[Interval], in: Vector[Cands])

  /** Lift an uncompressed tuple (out indices ++ in indices) into a working
    * row with the full candidate set (absolute point + every delta).
    */
  def fromPoint(row: Array[Long], nOut: Int, nIn: Int): WRow = {
    val out = Vector.tabulate(nOut)(j => Interval.point(row(j)))
    val in = Vector.tabulate(nIn) { i =>
      val a = row(nOut + i)
      Cands(
        Some(Interval.point(a)),
        Vector.tabulate(nOut)(j => Some(Interval.point(a - row(j)))),
      )
    }
    WRow(out, in)
  }

  /** Re-derive the richest candidate set implied by a finished row — used
    * when re-merging already-compressed rows (e.g. across Spark partition
    * boundaries). When every output axis is a point, absolute and relative
    * components are mutually derivable; otherwise only the stored component
    * is exact.
    */
  def fromCRow(r: CRow): WRow = {
    val nOut = r.out.size
    // A delta against output axis j is exact iff that axis is a point —
    // independently of the other axes.
    def relsFromAbs(iv: Interval): Vector[Option[Interval]] =
      Vector.tabulate(nOut)(j =>
        if (r.out(j).len == 1) Some(iv.shift(-r.out(j).lo)) else None)
    val in = r.in.map {
      case AbsEnc(iv) => Cands(Some(iv), relsFromAbs(iv))
      case RelEnc(j, d) =>
        val abs = if (r.out(j).len == 1) Some(d.shift(r.out(j).lo)) else None
        abs match {
          case Some(iv) => Cands(Some(iv), relsFromAbs(iv).updated(j, Some(d)))
          case None =>
            Cands(None, Vector.tabulate(nOut)(k => if (k == j) Some(d) else None))
        }
    }
    WRow(r.out, in)
  }

  /** Pick the final encoding per input attribute: absolute if preserved
    * (paper pattern 2), else the lowest-numbered relative component
    * (pattern 3).
    */
  def toCRow(w: WRow): CRow = CRow(
    w.out,
    w.in.map { c =>
      c.abs match {
        case Some(iv) => AbsEnc(iv)
        case None =>
          val j = c.rels.indexWhere(_.isDefined)
          require(j >= 0, "empty candidate set — merge rule violated")
          RelEnc(j, c.rels(j).get)
      }
    },
  )

  /** Compress an uncompressed lineage relation with `nOut` output and `nIn`
    * input attributes. Rows must be distinct (set semantics, paper §IV-B).
    */
  def compress(rows: Iterator[Array[Long]], nOut: Int, nIn: Int): Vector[CRow] = {
    val work = rows.map(fromPoint(_, nOut, nIn)).toVector
    compressWRows(work, nOut, nIn).map(toCRow)
  }

  /** Re-merge already-compressed rows (driver-side boundary merge). */
  def remerge(rows: Vector[CRow], nOut: Int, nIn: Int): Vector[CRow] =
    compressWRows(rows.map(fromCRow), nOut, nIn).map(toCRow)

  /** Run per-axis merge passes to a (bounded) fixpoint. */
  def compressWRows(rows0: Vector[WRow], nOut: Int, nIn: Int): Vector[WRow] = {
    var rows = rows0
    var prev = Long.MaxValue
    var iter = 0
    while (rows.size < prev && iter < 3) {
      prev = rows.size
      iter += 1
      var i = nIn - 1
      while (i >= 0) { rows = inPass(rows, i); i -= 1 }
      var j = nOut - 1
      while (j >= 0) { rows = outPass(rows, j); j -= 1 }
    }
    rows
  }

  // ---------------------------------------------------------------- passes

  /** Canonical sort key of a candidate set: `(tag, lo, hi)` preferring the
    * delta against `prefRel` when requested, else absolute, else the first
    * defined delta. Rows that can merge share equal components, so keying on
    * a preferred component makes them sort adjacent.
    */
  private def candKey(c: Cands, prefRel: Int): (Long, Long, Long) = {
    if (prefRel >= 0 && c.rels(prefRel).isDefined) {
      val d = c.rels(prefRel).get; (1L + prefRel, d.lo, d.hi)
    } else c.abs match {
      case Some(iv) => (0L, iv.lo, iv.hi)
      case None =>
        val j = c.rels.indexWhere(_.isDefined)
        val d = c.rels(j).get
        (1L + j, d.lo, d.hi)
    }
  }

  private object LongArrayOrdering extends Ordering[Array[Long]] {
    def compare(x: Array[Long], y: Array[Long]): Int = {
      val n = math.min(x.length, y.length)
      var i = 0
      while (i < n) {
        val c = java.lang.Long.compare(x(i), y(i))
        if (c != 0) return c
        i += 1
      }
      Integer.compare(x.length, y.length)
    }
  }

  /** Generic merge pass: rows are sorted by `(groupKey, sortPos, tiebreak)`;
    * within a group a small set of "active chains" is kept and each
    * incoming row is merged into the first chain that accepts it. This is
    * robust to rows whose candidate *sets* differ even though a shared
    * component would allow the merge (which defeats purely adjacent
    * scanning), while staying near-linear: chains are evicted once the sort
    * position has moved past any possible adjacency.
    */
  private val MaxActiveChains = 64

  private def chainPass(
      rows: Vector[WRow],
      key: WRow => Array[Long],
      groupLen: Int,
      canStillMerge: (WRow, WRow) => Boolean,
      tryMerge: (WRow, WRow) => Option[WRow],
  ): Vector[WRow] = {
    if (rows.size <= 1) return rows
    val keyed = rows.map(r => (key(r), r)).sortBy(_._1)(LongArrayOrdering)
    val out = new ArrayBuffer[WRow](rows.size)
    val active = new ArrayBuffer[WRow](MaxActiveChains)
    var groupKey: Array[Long] = null

    def sameGroup(k: Array[Long]): Boolean = {
      if (groupKey == null) return false
      var i = 0
      while (i < groupLen) { if (groupKey(i) != k(i)) return false; i += 1 }
      true
    }

    keyed.foreach { case (k, row) =>
      if (!sameGroup(k)) {
        out ++= active; active.clear()
        groupKey = k
      } else {
        // Evict chains that can no longer merge with anything at or past
        // this sort position.
        var i = 0
        while (i < active.size) {
          if (!canStillMerge(active(i), row)) { out += active(i); active.remove(i) }
          else i += 1
        }
      }
      var merged = false
      var i = 0
      while (!merged && i < active.size) {
        tryMerge(active(i), row) match {
          case Some(m) => active(i) = m; merged = true
          case None    => i += 1
        }
      }
      if (!merged) {
        if (active.size >= MaxActiveChains) { out += active.head; active.remove(0) }
        active += row
      }
    }
    out ++= active
    out.toVector
  }

  /** Range-encoding pass along input axis `i` (paper step 1 generalized):
    * groups share the exact output intervals; within a group, chains grow
    * along axis `i`.
    */
  private def inPass(rows: Vector[WRow], i: Int): Vector[WRow] = {
    if (rows.isEmpty) return rows
    val groupLen = rows.head.out.size * 2
    // Merge axis LAST in the sort key: rows of the same chain (equal other
    // attributes) must be consecutive, ordered along axis i.
    def key(w: WRow): Array[Long] = {
      val b = Array.newBuilder[Long]
      b.sizeHint(groupLen + 3 + w.in.size * 3)
      w.out.foreach { iv => b += iv.lo; b += iv.hi }
      var k = 0
      while (k < w.in.size) {
        if (k != i) {
          val (t2, l2, h2) = candKey(w.in(k), -1)
          b += t2; b += l2; b += h2
        }
        k += 1
      }
      val (t, l, h) = candKey(w.in(i), -1)
      b += t; b += l; b += h
      b.result()
    }
    def canStillMerge(chain: WRow, row: WRow): Boolean = {
      // Sorted by candKey(axis i): once the row's components have moved past
      // a chain on every shared component, the chain is dead.
      val c = chain.in(i); val r = row.in(i)
      val absAlive = (c.abs, r.abs) match {
        case (Some(a), Some(b)) => a.hi + 1 >= b.lo
        case _                  => false
      }
      val relAlive = c.rels.lazyZip(r.rels).exists {
        case (Some(a), Some(b)) => a.hi + 1 >= b.lo
        case _                  => false
      }
      absAlive || relAlive
    }
    chainPass(rows, key, groupLen, canStillMerge, (a, b) => tryMergeIn(a, b, i))
  }

  private def tryMergeIn(a: WRow, b: WRow, i: Int): Option[WRow] = {
    if (a.out != b.out) return None
    val n = a.in.size
    val merged = new Array[Cands](n)
    var k = 0
    while (k < n) {
      if (k != i) {
        val e = a.in(k).equalComponents(b.in(k))
        if (!e.defined) return None
        merged(k) = e
      }
      k += 1
    }
    val u = a.in(i).unionComponents(b.in(i))
    if (!u.defined) return None
    merged(i) = u
    Some(WRow(a.out, merged.toVector))
  }

  /** Range-encoding pass along output axis `j` (paper step 2): groups share
    * the other output intervals; chains grow along `out(j)` and accept rows
    * whose candidate sets share an equal component per input axis.
    */
  private def outPass(rows: Vector[WRow], j: Int): Vector[WRow] = {
    if (rows.isEmpty) return rows
    val groupLen = (rows.head.out.size - 1) * 2
    // Merge axis directly after the group key: rows stream through in
    // out(j) order, so the adjacency eviction below is sound and chains
    // with *different* candidate keys (e.g. boundary singletons between
    // already-merged ranges) still meet their merge partners. Candidate
    // keys only break ties.
    def key(w: WRow): Array[Long] = {
      val b = Array.newBuilder[Long]
      b.sizeHint(groupLen + 2 + w.in.size * 3)
      var k = 0
      while (k < w.out.size) {
        if (k != j) { b += w.out(k).lo; b += w.out(k).hi }
        k += 1
      }
      b += w.out(j).lo
      b += w.out(j).hi
      w.in.foreach { c =>
        val (t, l, h) = candKey(c, j)
        b += t; b += l; b += h
      }
      b.result()
    }
    def canStillMerge(chain: WRow, row: WRow): Boolean =
      chain.out(j).hi + 1 >= row.out(j).lo
    chainPass(rows, key, groupLen, canStillMerge, (a, b) => tryMergeOut(a, b, j))
  }

  private def tryMergeOut(a: WRow, b: WRow, j: Int): Option[WRow] = {
    var k = 0
    while (k < a.out.size) {
      if (k != j && a.out(k) != b.out(k)) return None
      k += 1
    }
    if (!a.out(j).mergeable(b.out(j))) return None
    val n = a.in.size
    val merged = new Array[Cands](n)
    k = 0
    while (k < n) {
      val e = a.in(k).equalComponents(b.in(k))
      if (!e.defined) return None
      merged(k) = e
      k += 1
    }
    Some(WRow(a.out.updated(j, a.out(j).union(b.out(j))), merged.toVector))
  }

  // ----------------------------------------------------------- decompress

  /** Expand compressed rows back into the exact original relation (order
    * unspecified). Only meant for tests / small tables — expansion can be
    * combinatorially larger than the compressed form.
    */
  def decompress(rows: Iterable[CRow]): Iterator[Array[Long]] =
    rows.iterator.flatMap { r =>
      cartesian(r.out).flatMap { bvec =>
        val ivs = r.in.map(_.resolve(bvec))
        cartesian(ivs).map(avec => Array.concat(bvec.toArray, avec.toArray))
      }
    }

  private def cartesian(ivs: Seq[Interval]): Iterator[Vector[Long]] =
    ivs.foldLeft(Iterator.single(Vector.empty[Long])) { (acc, iv) =>
      acc.flatMap(p => (iv.lo to iv.hi).iterator.map(v => p :+ v))
    }
}
