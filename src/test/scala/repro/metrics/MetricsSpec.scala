package repro.metrics

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("accuracy all correct / all wrong / half") {
    assert(Metrics.accuracy(Array(1, 2, 3), Array(1, 2, 3)) == 1.0)
    assert(Metrics.accuracy(Array(1, 2, 3), Array(0, 0, 0)) == 0.0)
    assert(Metrics.accuracy(Array(1, 0), Array(1, 1)) == 0.5)
  }

  test("accuracy rejects mismatched lengths") {
    intercept[IllegalArgumentException](Metrics.accuracy(Array(1), Array(1, 2)))
    intercept[IllegalArgumentException](Metrics.accuracy(Array.empty[Int], Array.empty[Int]))
  }

  test("microF1 perfect prediction = 1") {
    val y = Array(Array(true, false, true), Array(false, true, false))
    assert(Metrics.microF1(y.map(_.clone()), y) == 1.0)
  }

  test("microF1 nothing predicted, positives exist = 0") {
    val pred = Array(Array(false, false))
    val y = Array(Array(true, false))
    assert(Metrics.microF1(pred, y) == 0.0)
  }

  test("microF1 hand-computed mixed case") {
    // tp=2, fp=1, fn=1 → P=2/3, R=2/3, F1=2/3
    val pred = Array(Array(true, true, false), Array(true, false, false))
    val y = Array(Array(true, false, true), Array(true, false, false))
    assert(math.abs(Metrics.microF1(pred, y) - 2.0 / 3.0) < 1e-12)
  }

  test("microF1 pools counts across samples (micro, not macro)") {
    // sample 1 perfect, sample 2 all wrong: micro pools decisions
    val pred = Array(Array(true, true), Array(true, true))
    val y = Array(Array(true, true), Array(false, false))
    // tp=2, fp=2, fn=0 → P=.5 R=1 F1=2/3
    assert(math.abs(Metrics.microF1(pred, y) - 2.0 / 3.0) < 1e-12)
  }

  test("microF1 rejects ragged input") {
    intercept[IllegalArgumentException](
      Metrics.microF1(Array(Array(true)), Array(Array(true, false))))
  }
}
