package repro.provrc

import java.nio.file.Files
import org.scalatest.funsuite.AnyFunSuite

class CodecSpec extends AnyFunSuite {

  private val table = Vector(
    CRow(Vector(Interval(0, 99), Interval(3, 3)),
         Vector(RelEnc(0, Interval(-2, 2)), AbsEnc(Interval(0, 7)))),
    CRow(Vector(Interval(100, 100), Interval(0, 0)),
         Vector(AbsEnc(Interval(-5, -1)), RelEnc(1, Interval(0, 0)))),
  )

  test("encode/decode roundtrip preserves rows and arity") {
    val bytes = Codec.encode(table, 2, 2)
    val (rows, nOut, nIn) = Codec.decode(bytes)
    assert((rows, nOut, nIn) == ((table, 2, 2)))
  }

  test("empty table roundtrip") {
    val (rows, nOut, nIn) = Codec.decode(Codec.encode(Vector.empty, 3, 1))
    assert(rows.isEmpty && nOut == 3 && nIn == 1)
  }

  test("negative bounds are zigzag encoded correctly") {
    val t = Vector(CRow(Vector(Interval(0, 0)), Vector(AbsEnc(Interval(-1000000, -999999)))))
    assert(Codec.decode(Codec.encode(t, 1, 1))._1 == t)
  }

  test("file roundtrip, plain") {
    val dir = Files.createTempDirectory("codec")
    val p = dir.resolve("t.prc")
    Codec.writeFile(p, table, 2, 2, gzip = false)
    assert(Codec.readFile(p, gzip = false)._1 == table)
  }

  test("file roundtrip, gzip") {
    val dir = Files.createTempDirectory("codec")
    val p = dir.resolve("t.prc.gz")
    Codec.writeFile(p, table, 2, 2, gzip = true)
    assert(Codec.readFile(p, gzip = true)._1 == table)
  }

  test("gzip helps on repetitive tables") {
    val rep = Vector.tabulate(2000)(i =>
      CRow(Vector(Interval.point(i.toLong * 2)), Vector(AbsEnc(Interval(5, 9)))))
    val dir = Files.createTempDirectory("codec")
    val plain = dir.resolve("p.prc"); val gz = dir.resolve("p.prc.gz")
    Codec.writeFile(plain, rep, 1, 1, gzip = false)
    Codec.writeFile(gz, rep, 1, 1, gzip = true)
    assert(Files.size(gz) < Files.size(plain))
    assert(Codec.readFile(gz, gzip = true)._1 == rep)
  }

  test("decode rejects garbage") {
    intercept[Exception](Codec.decode(Array[Byte](1, 2, 3, 4, 5, 6)))
  }

  test("compressed binary of structured lineage is tiny") {
    val rows = (0L until 100000L).map(i => Array(i, i))
    val c = ProvRC.compress(rows.iterator, 1, 1)
    val bytes = Codec.encode(c, 1, 1)
    assert(bytes.length < 64, s"expected a handful of bytes, got ${bytes.length}")
  }
}
