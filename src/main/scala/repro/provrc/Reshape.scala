package repro.provrc

/** Index reshaping for lineage reuse (paper Section VI-B, `gen_sig`).
  *
  * A compressed table is generalized by replacing every interval equal to a
  * full axis extent `[0, d − 1]` of one of the operation's input arrays with
  * the symbolic interval `[0, D − 1]`, where `D` names that dimension. The
  * generalized table can then be instantiated for a future call with
  * different array shapes. Whether the generalization is *valid* (i.e. those
  * intervals were the only shape-dependent values) is decided by the
  * automatic reuse predictor, which validates the instantiation against a
  * second captured call (m = 1).
  */
object Reshape {

  /** A possibly-symbolic interval. */
  sealed trait GIv {
    def instantiate(dims: Map[String, Long]): Interval = this match {
      case GAbs(iv)   => iv
      case GFull(dim) => Interval(0, dims(dim) - 1)
    }
  }
  final case class GAbs(iv: Interval) extends GIv
  /** The full extent of named dimension `dim`: `[0, D_dim − 1]`. */
  final case class GFull(dim: String) extends GIv

  sealed trait GEnc
  final case class GAbsEnc(g: GIv) extends GEnc
  final case class GRelEnc(outAxis: Int, delta: Interval) extends GEnc

  final case class GRow(out: Vector[GIv], in: Vector[GEnc])

  /** Generalize a compressed table given the named input-array dimensions
    * `(name, extent)`. An interval equal to `[0, extent − 1]` of some
    * dimension is replaced by that dimension's symbol; when several
    * dimensions share an extent the first match is taken — exactly the
    * ambiguity that produced the paper's one misprediction (`cross`), caught
    * downstream by validation.
    */
  def generalize(rows: Vector[CRow], dims: Seq[(String, Long)]): Vector[GRow] = {
    def gIv(iv: Interval): GIv =
      if (iv.lo == 0)
        dims.find { case (_, e) => iv.hi == e - 1 } match {
          case Some((name, _)) => GFull(name)
          case None            => GAbs(iv)
        }
      else GAbs(iv)

    rows.map { r =>
      GRow(
        r.out.map(gIv),
        r.in.map {
          case AbsEnc(iv)   => GAbsEnc(gIv(iv))
          case RelEnc(j, d) => GRelEnc(j, d)
        },
      )
    }
  }

  /** Instantiate a generalized table for new dimension extents. */
  def instantiate(rows: Vector[GRow], dims: Map[String, Long]): Vector[CRow] =
    rows.map { r =>
      CRow(
        r.out.map(_.instantiate(dims)),
        r.in.map {
          case GAbsEnc(g)    => AbsEnc(g.instantiate(dims))
          case GRelEnc(j, d) => RelEnc(j, d)
        },
      )
    }

  /** True when at least one symbol was introduced (otherwise gen_sig offers
    * nothing over dim_sig).
    */
  def isGeneralized(rows: Vector[GRow]): Boolean =
    rows.exists(r =>
      r.out.exists(_.isInstanceOf[GFull]) ||
        r.in.exists { case GAbsEnc(_: GFull) => true; case _ => false }
    )
}
