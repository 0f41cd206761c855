package repro.nn

import org.scalatest.funsuite.AnyFunSuite

class DMatSpec extends AnyFunSuite {

  private def m(rows: Int, cols: Int)(vs: Double*): DMat = new DMat(rows, cols, vs.toArray)

  test("apply/update round-trip") {
    val x = DMat.zeros(2, 3)
    x(1, 2) = 5.0
    assert(x(1, 2) == 5.0 && x(0, 0) == 0.0)
  }

  test("shape validation rejects bad arrays") {
    intercept[IllegalArgumentException](new DMat(2, 2, Array(1.0)))
  }

  test("matmul 2x2 hand-computed") {
    val a = m(2, 2)(1, 2, 3, 4)
    val b = m(2, 2)(5, 6, 7, 8)
    val c = a.matmul(b)
    assert(c.a.toSeq == Seq(19.0, 22.0, 43.0, 50.0))
  }

  test("matmul identity is a no-op") {
    val a = DMat.randn(3, 3, 1.0, 1)
    assert(a.matmul(DMat.eye(3)).maxAbsDiff(a) == 0.0)
    assert(DMat.eye(3).matmul(a).maxAbsDiff(a) == 0.0)
  }

  test("matmul rectangular shapes") {
    val a = DMat.randn(2, 5, 1.0, 2)
    val b = DMat.randn(5, 3, 1.0, 3)
    val c = a.matmul(b)
    assert(c.rows == 2 && c.cols == 3)
    // spot check one entry
    var s = 0.0
    (0 until 5).foreach(k => s += a(1, k) * b(k, 2))
    assert(math.abs(c(1, 2) - s) < 1e-12)
  }

  test("matmul shape mismatch throws") {
    intercept[IllegalArgumentException](DMat.zeros(2, 3).matmul(DMat.zeros(2, 3)))
  }

  test("transpose twice is identity") {
    val a = DMat.randn(3, 5, 1.0, 4)
    assert(a.t.t.maxAbsDiff(a) == 0.0)
  }

  test("transpose swaps indices") {
    val a = DMat.randn(3, 5, 1.0, 5)
    val b = a.t
    assert(b.rows == 5 && b.cols == 3)
    assert(b(4, 2) == a(2, 4))
  }

  test("(A*B)^T == B^T * A^T") {
    val a = DMat.randn(3, 4, 1.0, 6)
    val b = DMat.randn(4, 2, 1.0, 7)
    assert(a.matmul(b).t.maxAbsDiff(b.t.matmul(a.t)) < 1e-12)
  }

  test("add / sub / hadamard elementwise") {
    val a = m(1, 3)(1, 2, 3)
    val b = m(1, 3)(4, 5, 6)
    assert((a + b).a.toSeq == Seq(5.0, 7.0, 9.0))
    assert((b - a).a.toSeq == Seq(3.0, 3.0, 3.0))
    assert(a.hadamard(b).a.toSeq == Seq(4.0, 10.0, 18.0))
  }

  test("zipWith shape mismatch throws") {
    intercept[IllegalArgumentException](DMat.zeros(1, 2) + DMat.zeros(2, 1))
  }

  test("scale and map") {
    val a = m(1, 3)(1, -2, 3)
    assert(a.scale(2).a.toSeq == Seq(2.0, -4.0, 6.0))
    assert(a.map(math.abs).a.toSeq == Seq(1.0, 2.0, 3.0))
  }

  test("addInPlace mutates receiver") {
    val a = m(1, 2)(1, 2)
    a.addInPlace(m(1, 2)(10, 20))
    assert(a.a.toSeq == Seq(11.0, 22.0))
  }

  test("addRowVec broadcasts over rows") {
    val a = m(2, 2)(1, 2, 3, 4)
    val v = m(1, 2)(10, 20)
    assert(a.addRowVec(v).a.toSeq == Seq(11.0, 22.0, 13.0, 24.0))
  }

  test("addRowVec rejects wrong shape") {
    intercept[IllegalArgumentException](DMat.zeros(2, 2).addRowVec(DMat.zeros(1, 3)))
  }

  test("colSum") {
    val a = m(2, 3)(1, 2, 3, 4, 5, 6)
    assert(a.colSum.a.toSeq == Seq(5.0, 7.0, 9.0))
  }

  test("sumAll") {
    assert(m(2, 2)(1, 2, 3, 4).sumAll == 10.0)
  }

  test("selectRows with duplicates") {
    val a = m(3, 2)(1, 2, 3, 4, 5, 6)
    val s = a.selectRows(Array(2, 0, 2))
    assert(s.rows == 3 && s.a.toSeq == Seq(5.0, 6.0, 1.0, 2.0, 5.0, 6.0))
  }

  test("row returns a defensive copy") {
    val a = m(2, 2)(1, 2, 3, 4)
    val r = a.row(0)
    r(0) = 99
    assert(a(0, 0) == 1.0)
  }

  test("toRows matches row") {
    val a = DMat.randn(4, 3, 1.0, 8)
    assert(a.toRows.zipWithIndex.forall { case (r, i) => r.toSeq == a.row(i).toSeq })
  }

  test("copy is independent") {
    val a = m(1, 2)(1, 2)
    val b = a.copy
    b(0, 0) = 7
    assert(a(0, 0) == 1.0)
  }

  test("maxAbsDiff") {
    assert(m(1, 2)(1, 5).maxAbsDiff(m(1, 2)(2, 3)) == 2.0)
  }

  test("randn deterministic in seed") {
    assert(DMat.randn(3, 3, 1.0, 42).maxAbsDiff(DMat.randn(3, 3, 1.0, 42)) == 0.0)
    assert(DMat.randn(3, 3, 1.0, 42).maxAbsDiff(DMat.randn(3, 3, 1.0, 43)) > 0.0)
  }

  test("glorot std scales with fan sizes") {
    val big = DMat.glorot(1000, 1000, 1)
    val mean = big.sumAll / big.a.length
    assert(math.abs(mean) < 0.001)
    val varc = big.a.map(v => v * v).sum / big.a.length
    assert(math.abs(varc - 2.0 / 2000) < 3e-4)
  }

  test("fromRows round-trips toRows") {
    val a = DMat.randn(5, 4, 1.0, 9)
    assert(DMat.fromRows(a.toRows.toIndexedSeq).maxAbsDiff(a) == 0.0)
  }

  test("fromRows rejects ragged input") {
    intercept[IllegalArgumentException](DMat.fromRows(Seq(Array(1.0), Array(1.0, 2.0))))
  }

  test("rowVec copies input") {
    val src = Array(1.0, 2.0)
    val v = DMat.rowVec(src)
    src(0) = 9
    assert(v(0, 0) == 1.0)
  }

  test("property: matmul distributes over addition (30 random shapes)") {
    val rng = new java.util.Random(1)
    (0 until 30).foreach { t =>
      val (r, k, c) = (1 + rng.nextInt(5), 1 + rng.nextInt(5), 1 + rng.nextInt(5))
      val a = DMat.randn(r, k, 1.0, t)
      val b = DMat.randn(k, c, 1.0, t + 100)
      val d = DMat.randn(k, c, 1.0, t + 200)
      assert(a.matmul(b + d).maxAbsDiff(a.matmul(b) + a.matmul(d)) < 1e-10)
    }
  }

  test("property: colSum equals ones-vector matmul (30 random shapes)") {
    val rng = new java.util.Random(2)
    (0 until 30).foreach { t =>
      val (r, c) = (1 + rng.nextInt(6), 1 + rng.nextInt(6))
      val a = DMat.randn(r, c, 1.0, t)
      val ones = DMat.full(1, r, 1.0)
      assert(ones.matmul(a).maxAbsDiff(a.colSum) < 1e-12)
    }
  }
}
