package repro.metrics

/** Classification metrics used by the paper's Table II: accuracy for
  * single-label datasets (Products, MAG240M) and micro-F1 for the
  * multi-label PPI.
  */
object Metrics {

  def accuracy(pred: Array[Int], y: Array[Int]): Double = {
    require(pred.length == y.length && pred.nonEmpty, "accuracy arity")
    var ok = 0
    var i = 0
    while (i < pred.length) { if (pred(i) == y(i)) ok += 1; i += 1 }
    ok.toDouble / pred.length
  }

  /** Micro-averaged F1 over all (sample, class) decisions. */
  def microF1(pred: Array[Array[Boolean]], y: Array[Array[Boolean]]): Double = {
    require(pred.length == y.length && pred.nonEmpty, "microF1 arity")
    var tp = 0L; var fp = 0L; var fn = 0L
    var i = 0
    while (i < pred.length) {
      val p = pred(i); val t = y(i)
      require(p.length == t.length, "microF1 class arity")
      var j = 0
      while (j < p.length) {
        if (p(j) && t(j)) tp += 1
        else if (p(j) && !t(j)) fp += 1
        else if (!p(j) && t(j)) fn += 1
        j += 1
      }
      i += 1
    }
    if (tp == 0) 0.0
    else {
      val prec = tp.toDouble / (tp + fp)
      val rec = tp.toDouble / (tp + fn)
      2 * prec * rec / (prec + rec)
    }
  }
}
