package repro.nn

import org.scalatest.funsuite.AnyFunSuite

/** Finite-difference gradient checks for every autodiff op. */
object Grad {
  /** `build` must construct a fresh scalar loss from the given param nodes. */
  def check(params: Seq[Node], build: () => Node,
            eps: Double = 1e-5, tol: Double = 5e-4, maxEntries: Int = 24): Unit = {
    val loss = build()
    params.foreach(_.zeroGrad())
    AD.backward(loss)
    val analytic = params.map(_.g.copy)
    val rng = new java.util.Random(123)
    params.zipWithIndex.foreach { case (p, pi) =>
      val n = p.v.a.length
      val entries = if (n <= maxEntries) 0 until n else Seq.fill(maxEntries)(rng.nextInt(n))
      entries.foreach { i =>
        val orig = p.v.a(i)
        p.v.a(i) = orig + eps
        val fPlus = build().v(0, 0)
        p.v.a(i) = orig - eps
        val fMinus = build().v(0, 0)
        p.v.a(i) = orig
        val numeric = (fPlus - fMinus) / (2 * eps)
        val a = analytic(pi).a(i)
        val denom = math.max(1.0, math.max(math.abs(numeric), math.abs(a)))
        assert(math.abs(numeric - a) / denom < tol,
          s"param $pi entry $i: analytic=$a numeric=$numeric")
      }
    }
  }

  /** Reduce a matrix node to a scalar through fixed random projections
    * (so every entry's gradient is exercised with distinct coefficients).
    */
  def toScalar(x: Node, seed: Long = 77): Node = {
    val left = AD.input(DMat.randn(1, x.v.rows, 1.0, seed))
    val right = AD.input(DMat.randn(x.v.cols, 1, 1.0, seed + 1))
    AD.matmul(AD.matmul(left, x), right)
  }
}

class ADSpec extends AnyFunSuite {

  private def p(rows: Int, cols: Int, seed: Long): Node = AD.param(DMat.randn(rows, cols, 1.0, seed))

  test("matmul forward matches DMat") {
    val a = p(2, 3, 1); val b = p(3, 4, 2)
    assert(AD.matmul(a, b).v.maxAbsDiff(a.v.matmul(b.v)) == 0.0)
  }

  test("matmul gradients") {
    val a = p(3, 4, 1); val b = p(4, 2, 2)
    Grad.check(Seq(a, b), () => Grad.toScalar(AD.matmul(a, b)))
  }

  test("add gradients") {
    val a = p(3, 3, 3); val b = p(3, 3, 4)
    Grad.check(Seq(a, b), () => Grad.toScalar(AD.add(a, b)))
  }

  test("addBias gradients") {
    val x = p(4, 3, 5); val b = p(1, 3, 6)
    Grad.check(Seq(x, b), () => Grad.toScalar(AD.addBias(x, b)))
  }

  test("scale gradients") {
    val x = p(3, 3, 7)
    Grad.check(Seq(x), () => Grad.toScalar(AD.scale(x, -2.5)))
  }

  test("hadamard gradients") {
    val a = p(3, 3, 8); val b = p(3, 3, 9)
    Grad.check(Seq(a, b), () => Grad.toScalar(AD.hadamard(a, b)))
  }

  test("relu forward and gradients") {
    val x = AD.param(new DMat(1, 4, Array(-1.0, 2.0, -3.0, 4.0)))
    assert(AD.relu(x).v.a.toSeq == Seq(0.0, 2.0, 0.0, 4.0))
    Grad.check(Seq(x), () => Grad.toScalar(AD.relu(x)))
  }

  test("leakyRelu forward and gradients") {
    val x = AD.param(new DMat(1, 2, Array(-2.0, 3.0)))
    assert(AD.leakyRelu(x, 0.1).v.a.toSeq == Seq(-0.2, 3.0))
    Grad.check(Seq(x), () => Grad.toScalar(AD.leakyRelu(x, 0.2)))
  }

  test("elu forward and gradients") {
    val x = AD.param(new DMat(1, 2, Array(-1.0, 2.0)))
    val out = AD.elu(x).v
    assert(math.abs(out.a(0) - (math.exp(-1.0) - 1)) < 1e-12 && out.a(1) == 2.0)
    val y = p(3, 3, 10)
    Grad.check(Seq(y), () => Grad.toScalar(AD.elu(y)))
  }

  test("gatherRows forward and gradients (with duplicate indices)") {
    val x = p(4, 3, 11)
    val idx = Array(2, 0, 2, 3)
    assert(AD.gatherRows(x, idx).v.maxAbsDiff(x.v.selectRows(idx)) == 0.0)
    Grad.check(Seq(x), () => Grad.toScalar(AD.gatherRows(x, idx)))
  }

  test("segmentSum forward hand-computed") {
    val x = AD.input(new DMat(3, 2, Array(1.0, 2, 3, 4, 5, 6)))
    val out = AD.segmentSum(x, Array(1, 0, 1), 2).v
    assert(out.a.toSeq == Seq(3.0, 4.0, 6.0, 8.0))
  }

  test("segmentSum gradients") {
    val x = p(5, 3, 12)
    Grad.check(Seq(x), () => Grad.toScalar(AD.segmentSum(x, Array(0, 1, 1, 2, 0), 3)))
  }

  test("divRows forward and gradients") {
    val x = p(3, 2, 13)
    val d = Array(2.0, 4.0, 1.0)
    assert(math.abs(AD.divRows(x, d).v(1, 1) - x.v(1, 1) / 4.0) < 1e-12)
    Grad.check(Seq(x), () => Grad.toScalar(AD.divRows(x, d)))
  }

  test("segmentSoftmax rows sum to 1 within each segment/column") {
    val x = p(6, 2, 14)
    val seg = Array(0, 1, 0, 2, 1, 0)
    val out = AD.segmentSoftmax(x, seg, 3).v
    (0 until 2).foreach { c =>
      val sums = new Array[Double](3)
      (0 until 6).foreach(e => sums(seg(e)) += out(e, c))
      sums.foreach(s => assert(math.abs(s - 1.0) < 1e-12))
    }
  }

  test("segmentSoftmax singleton segment gives 1") {
    val x = AD.input(new DMat(1, 1, Array(3.7)))
    assert(AD.segmentSoftmax(x, Array(0), 1).v(0, 0) == 1.0)
  }

  test("segmentSoftmax gradients") {
    val x = p(6, 2, 15)
    Grad.check(Seq(x), () => Grad.toScalar(AD.segmentSoftmax(x, Array(0, 1, 0, 2, 1, 0), 3)))
  }

  test("mulBroadcastCol forward and gradients") {
    val x = p(4, 3, 16); val w = p(4, 1, 17)
    assert(math.abs(AD.mulBroadcastCol(x, w).v(2, 1) - x.v(2, 1) * w.v(2, 0)) < 1e-12)
    Grad.check(Seq(x, w), () => Grad.toScalar(AD.mulBroadcastCol(x, w)))
  }

  test("concatCols forward and gradients") {
    val a = p(3, 2, 18); val b = p(3, 3, 19)
    val out = AD.concatCols(Seq(a, b)).v
    assert(out.cols == 5 && out(1, 0) == a.v(1, 0) && out(1, 4) == b.v(1, 2))
    Grad.check(Seq(a, b), () => Grad.toScalar(AD.concatCols(Seq(a, b))))
  }

  test("softmaxCE loss of uniform logits is log(C)") {
    val x = AD.input(DMat.zeros(2, 4))
    val loss = AD.softmaxCE(x, Array(0, 3))
    assert(math.abs(loss.v(0, 0) - math.log(4)) < 1e-12)
  }

  test("softmaxCE gradients") {
    val x = p(4, 3, 20)
    Grad.check(Seq(x), () => AD.softmaxCE(x, Array(0, 2, 1, 1)))
  }

  test("sigmoidBCE loss of zero logits is log 2") {
    val x = AD.input(DMat.zeros(2, 3))
    val y = new DMat(2, 3, Array(1.0, 0, 1, 0, 1, 0))
    assert(math.abs(AD.sigmoidBCE(x, y).v(0, 0) - math.log(2)) < 1e-12)
  }

  test("sigmoidBCE gradients") {
    val x = p(3, 4, 21)
    val y = new DMat(3, 4, Array.tabulate(12)(i => (i % 3 == 0).compareTo(false).toDouble))
    Grad.check(Seq(x), () => AD.sigmoidBCE(x, y))
  }

  test("backward on shared subexpression accumulates both paths") {
    val x = AD.param(new DMat(1, 1, Array(3.0)))
    // f = x*x (via hadamard): df/dx = 2x
    val loss = AD.hadamard(x, x)
    AD.backward(loss)
    assert(math.abs(x.g(0, 0) - 6.0) < 1e-12)
  }

  test("backward from non-scalar throws") {
    intercept[IllegalArgumentException](AD.backward(AD.param(DMat.zeros(2, 2))))
  }

  test("composite expression gradients (mini MLP)") {
    val x = AD.input(DMat.randn(5, 4, 1.0, 22))
    val w1 = p(4, 6, 23); val b1 = p(1, 6, 24); val w2 = p(6, 3, 25)
    def build(): Node = {
      val h = AD.relu(AD.addBias(AD.matmul(x, w1), b1))
      AD.softmaxCE(AD.matmul(h, w2), Array(0, 1, 2, 0, 1))
    }
    Grad.check(Seq(w1, b1, w2), build _)
  }
}
