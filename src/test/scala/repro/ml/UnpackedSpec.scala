package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.ring.{CofactorSchema, Triple}

/** Dense unpacking of a triple into the full one-hot cofactor matrix. */
class UnpackedSpec extends AnyFunSuite {

  private val schema = CofactorSchema(Seq("x"), Seq("c"))

  private def mk(rows: Seq[(Double, Int)]): Unpacked = {
    val t = Triple.zero(1, 1)
    rows.foreach { case (x, c) => t.addRow(Array(x), Array(c)) }
    new Unpacked(schema, t)
  }

  test("dictionaries list observed categories in sorted order") {
    val up = mk(Seq((1.0, 5), (2.0, 3), (3.0, 5)))
    assert(up.dicts(0).toSeq == Seq(3, 5))
    assert(up.dim == 1 + 1 + 2)
  }

  test("matrix entries encode the expected aggregates") {
    val up = mk(Seq((1.0, 0), (2.0, 1), (3.0, 1)))
    val m = up.matrix
    assert(m(0)(0) == 3.0)            // SUM(1)
    assert(m(0)(1) == 6.0)            // SUM(x)
    assert(m(1)(1) == 14.0)           // SUM(x²)
    assert(m(0)(up.catCol(0, 0)) == 1.0) // count of category 0
    assert(m(0)(up.catCol(0, 1)) == 2.0)
    assert(m(1)(up.catCol(0, 1)) == 5.0) // SUM(x) where c = 1
    assert(m(up.catCol(0, 1))(up.catCol(0, 1)) == 2.0) // one-hot diagonal
    assert(m(up.catCol(0, 0))(up.catCol(0, 1)) == 0.0) // same-attr off-diagonal
  }

  test("matrix is symmetric") {
    val up = mk(Seq((1.5, 0), (2.5, 2), (-1.0, 0), (0.5, 2)))
    val m = up.matrix
    for (i <- 0 until up.dim; j <- 0 until up.dim) assert(m(i)(j) == m(j)(i))
  }

  test("catCol returns -1 for unseen categories") {
    val up = mk(Seq((1.0, 7)))
    assert(up.catCol(0, 9) == -1 && up.catCol(0, 7) >= 0)
  }

  test("cross-categorical block carries the pair counts") {
    val sch2 = CofactorSchema(Nil, Seq("a", "b"))
    val t = Triple.zero(0, 2)
    t.addRow(Array.empty, Array(0, 1))
    t.addRow(Array.empty, Array(0, 1))
    t.addRow(Array.empty, Array(1, 0))
    val up = new Unpacked(sch2, t)
    val m = up.matrix
    assert(m(up.catOffsets(0) + 0)(up.catOffsets(1) + 1) == 2.0) // (a=0, b=1)
    assert(m(up.catOffsets(0) + 1)(up.catOffsets(1) + 0) == 1.0) // (a=1, b=0)
    assert(m(up.catOffsets(0) + 0)(up.catOffsets(1) + 0) == 0.0)
  }

  test("arity mismatch between schema and triple is rejected") {
    intercept[IllegalArgumentException](new Unpacked(schema, Triple.zero(2, 1)))
  }
}
