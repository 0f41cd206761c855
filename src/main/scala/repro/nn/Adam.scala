package repro.nn

/** Adam optimizer over a fixed list of parameter nodes. */
final class Adam(params: Seq[Node], lr: Double = 1e-2,
                 beta1: Double = 0.9, beta2: Double = 0.999, eps: Double = 1e-8) {
  require(params.forall(_.isParam), "Adam must only see parameter nodes")

  private val m = params.map(p => DMat.zeros(p.v.rows, p.v.cols)).toArray
  private val v = params.map(p => DMat.zeros(p.v.rows, p.v.cols)).toArray
  private var t = 0

  def zeroGrad(): Unit = params.foreach(_.zeroGrad())

  /** One update step from the currently accumulated gradients. */
  def step(): Unit = {
    t += 1
    val bc1 = 1.0 - math.pow(beta1, t)
    val bc2 = 1.0 - math.pow(beta2, t)
    var pi = 0
    params.foreach { p =>
      if (p.hasGrad) {
        val g = p.g
        val mi = m(pi); val vi = v(pi)
        var i = 0
        while (i < g.a.length) {
          mi.a(i) = beta1 * mi.a(i) + (1 - beta1) * g.a(i)
          vi.a(i) = beta2 * vi.a(i) + (1 - beta2) * g.a(i) * g.a(i)
          p.v.a(i) -= lr * (mi.a(i) / bc1) / (math.sqrt(vi.a(i) / bc2) + eps)
          i += 1
        }
      }
      pi += 1
    }
  }
}
