package repro.nn

import org.scalatest.funsuite.AnyFunSuite

class AdamSpec extends AnyFunSuite {

  /** f(x) = Σ x² as a scalar node (x must be 1×k). */
  private def quad(x: Node): Node =
    AD.matmul(AD.hadamard(x, x), AD.input(DMat.full(x.v.cols, 1, 1.0)))

  test("Adam minimizes a quadratic") {
    val x = AD.param(new DMat(1, 2, Array(5.0, -3.0)))
    val opt = new Adam(Seq(x), lr = 0.1)
    (0 until 300).foreach { _ =>
      val loss = quad(x)
      opt.zeroGrad()
      AD.backward(loss)
      opt.step()
    }
    assert(math.abs(x.v(0, 0)) < 0.05 && math.abs(x.v(0, 1)) < 0.05)
  }

  test("Adam rejects non-parameter nodes") {
    intercept[IllegalArgumentException](new Adam(Seq(AD.input(DMat.zeros(1, 1)))))
  }

  test("step with no gradients is a no-op") {
    val x = AD.param(new DMat(1, 1, Array(2.0)))
    val opt = new Adam(Seq(x))
    opt.zeroGrad()
    opt.step()
    assert(x.v(0, 0) == 2.0)
  }

  test("first Adam step size is ~lr regardless of gradient scale") {
    val x = AD.param(new DMat(1, 1, Array(100.0)))
    val opt = new Adam(Seq(x), lr = 0.5)
    val loss = quad(x)
    opt.zeroGrad(); AD.backward(loss); opt.step()
    // bias-corrected first step moves by ≈ lr toward the minimum
    assert(math.abs((100.0 - x.v(0, 0)) - 0.5) < 1e-6)
  }

  test("Adam trains a separable logistic problem to low loss") {
    val n = 200
    val xs = DMat.randn(n, 2, 1.0, 6)
    val ys = Array.tabulate(n)(i => if (xs(i, 0) + xs(i, 1) > 0) 1 else 0)
    val w = AD.param(DMat.randn(2, 2, 0.1, 7))
    val opt = new Adam(Seq(w), lr = 0.05)
    var last = Double.MaxValue
    (0 until 150).foreach { _ =>
      val loss = AD.softmaxCE(AD.matmul(AD.input(xs), w), ys)
      opt.zeroGrad(); AD.backward(loss); opt.step()
      last = loss.v(0, 0)
    }
    assert(last < 0.3, s"logistic loss did not converge: $last")
  }
}
