package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.col
import repro.provrc._
import scala.collection.mutable

/** A tracked array: a name plus a shape (paper §III-A `Array`). */
final case class TrackedArray(name: String, shape: Seq[Long]) {
  def arity: Int = shape.size
}

/** Both materializations of one captured lineage relationship
  * (paper §IV-C): the backward table is keyed (absolutely indexed) on the
  * output array's axes, the forward table on the input array's axes.
  */
final case class LineageTables(
    from: String,
    to: String,
    nFrom: Int,
    nTo: Int,
    forward: Vector[CRow],
    backward: Vector[CRow],
)

/** DSLog — the lineage storage manager (paper Section III).
  *
  * Arrays are defined with a shape; lineage between two tracked arrays is
  * ingested as a relation DataFrame (backward orientation: output-axis
  * columns first) and automatically compressed with ProvRC in both query
  * orientations. `provQuery` answers multi-hop forward/backward queries
  * along a path of arrays with the in-situ θ-join chain, without ever
  * decompressing a table.
  */
final class DSLog(val spark: SparkSession) {
  import ThetaJoin.Rect

  private val arrays = mutable.LinkedHashMap.empty[String, TrackedArray]
  private val edges = mutable.LinkedHashMap.empty[(String, String), LineageTables]

  def defineArray(name: String, shape: Seq[Long]): TrackedArray = {
    val a = TrackedArray(name, shape)
    arrays(name) = a
    a
  }

  def array(name: String): TrackedArray = arrays(name)

  /** Ingest captured lineage for the operation `from -> to`. `relation`
    * must be in backward orientation: the `to` array's axis columns first,
    * then the `from` array's axis columns.
    */
  def registerLineage(from: String, to: String, relation: DataFrame): LineageTables = {
    val nFrom = arrays(from).arity
    val nTo = arrays(to).arity
    require(relation.columns.length == nFrom + nTo,
      s"relation arity ${relation.columns.length} != $nTo + $nFrom")
    val backward = LineageCompressor.compress(relation, nTo)
    val cols = relation.columns
    val fwdDf = relation.select((cols.drop(nTo) ++ cols.take(nTo)).map(col).toSeq: _*)
    val forward = LineageCompressor.compress(fwdDf, nFrom)
    val t = LineageTables(from, to, nFrom, nTo, forward, backward)
    edges((from, to)) = t
    t
  }

  /** Register pre-compressed tables (used by the reuse path, where lineage
    * is reconstructed from a signature instead of captured).
    */
  def registerCompressed(t: LineageTables): Unit = edges((t.from, t.to)) = t

  def tables(from: String, to: String): LineageTables = edges((from, to))

  /** Resolve the table keyed on `x` for the hop `x -> y`, regardless of the
    * direction the underlying operation ran in.
    */
  def hopTable(x: String, y: String): Vector[CRow] =
    edges
      .get((x, y)).map(_.forward)
      .orElse(edges.get((y, x)).map(_.backward))
      .getOrElse(throw new NoSuchElementException(s"no lineage between $x and $y"))

  /** Multi-hop lineage query (paper §III-A `prov_query`): the cells of the
    * last array in `path` linked to `queryCells` of the first array.
    * Returns merged rectangles over the last array's axes.
    */
  def provQuery(
      path: Seq[String],
      queryCells: Seq[Rect],
      merge: Boolean = true,
      useSpark: Boolean = true,
  ): Vector[Rect] = {
    require(path.size >= 2, "path needs at least two arrays")
    queryCells.foreach(r =>
      require(r.size == arrays(path.head).arity, "query arity mismatch"))
    val hopTables = path.sliding(2).map { case Seq(x, y) => hopTable(x, y) }.toSeq
    QueryProcessor.insitu(spark, hopTables, queryCells, merge, useSpark)
  }
}
