package repro.arrays

import scala.util.Random

/** A minimal dense, row-major, double-precision n-dimensional array — the
  * data type our capture substrate (the `tracked_cell` substitute) operates
  * on. Indices are 0-based.
  */
final class NDArray(val shape: Vector[Int], val data: Array[Double]) {
  require(shape.product == data.length, s"shape $shape != ${data.length} cells")

  def size: Int = data.length
  def ndim: Int = shape.size

  val strides: Vector[Int] = shape.scanRight(1)(_ * _).tail

  def flatIndex(coords: Seq[Int]): Int =
    coords.lazyZip(strides).map(_ * _).sum

  def coords(flat: Int): Vector[Int] =
    shape.indices.map(i => (flat / strides(i)) % shape(i)).toVector

  def apply(coords: Int*): Double = data(flatIndex(coords))

  def map(f: Double => Double): NDArray = new NDArray(shape, data.map(f))

  def reshape(newShape: Vector[Int]): NDArray = {
    require(newShape.product == size)
    new NDArray(newShape, data)
  }

  override def toString: String = s"NDArray(${shape.mkString("x")})"
}

object NDArray {
  def zeros(shape: Vector[Int]): NDArray =
    new NDArray(shape, new Array[Double](shape.product))

  def fill(shape: Vector[Int])(f: Int => Double): NDArray =
    new NDArray(shape, Array.tabulate(shape.product)(f))

  def random(shape: Vector[Int], seed: Long): NDArray = {
    val rng = new Random(seed)
    fill(shape)(_ => rng.nextDouble() * 10 - 5)
  }

  def of(values: Double*): NDArray = new NDArray(Vector(values.size), values.toArray)
}

/** A locally captured lineage relation between one input array and the
  * output array of an operation: rows are (output coords ++ input coords),
  * distinct, 0-based — the same relational model DSLog ingests at Spark
  * scale.
  */
final case class LocalRel(nOut: Int, nIn: Int, rows: Vector[Array[Long]]) {
  def distinctRows: Vector[Array[Long]] =
    rows.map(_.toVector).distinct.map(_.toArray)

  /** Bytes of the relation rendered as a raw CSV — the denominator of the
    * paper's <0.5x compression-coverage criterion (Table IX).
    */
  def rawCsvBytes: Long =
    rows.iterator.map(r => r.mkString(",").length.toLong + 1L).sum
}

object LocalRel {
  def fromPairs(pairs: Iterable[(Seq[Int], Seq[Int])], nOut: Int, nIn: Int): LocalRel =
    LocalRel(
      nOut,
      nIn,
      pairs.iterator
        .map { case (o, i) => (o.map(_.toLong) ++ i.map(_.toLong)).toVector }
        .toVector
        .distinct
        .map(_.toArray),
    )
}
