package repro.nn

import scala.collection.mutable

/** A node in the autodiff tape: a value, its (lazily allocated) gradient,
  * the backward closure, and the parents it feeds gradient into.
  */
final class Node(val v: DMat, val isParam: Boolean = false) {
  private[nn] var grad: DMat = _
  private[nn] var back: () => Unit = () => ()
  private[nn] var parents: List[Node] = Nil

  /** Gradient accumulator, allocated on first touch. */
  def g: DMat = { if (grad == null) grad = DMat.zeros(v.rows, v.cols); grad }
  def hasGrad: Boolean = grad != null
  def zeroGrad(): Unit = grad = null
}

/** Reverse-mode matrix autodiff.
  *
  * Only the ops the GNN layers need: matmul, bias broadcast, gather/scatter
  * rows, segment sum, segment softmax (for GAT attention), pointwise
  * activations, and classification losses. Each op builds a [[Node]] whose
  * `back` closure routes upstream gradient to its parents; [[AD.backward]]
  * runs the closures in reverse topological order.
  */
object AD {

  def input(m: DMat): Node = new Node(m)
  def param(m: DMat): Node = new Node(m, isParam = true)

  private def mk(v: DMat, ps: List[Node])(bk: Node => Unit): Node = {
    val n = new Node(v)
    n.parents = ps
    n.back = () => bk(n)
    n
  }

  def matmul(a: Node, b: Node): Node =
    mk(a.v.matmul(b.v), List(a, b)) { o =>
      a.g.addInPlace(o.g.matmul(b.v.t))
      b.g.addInPlace(a.v.t.matmul(o.g))
    }

  def add(a: Node, b: Node): Node =
    mk(a.v + b.v, List(a, b)) { o => a.g.addInPlace(o.g); b.g.addInPlace(o.g) }

  /** x (N×F) + bias (1×F), broadcast over rows. */
  def addBias(x: Node, bias: Node): Node =
    mk(x.v.addRowVec(bias.v), List(x, bias)) { o =>
      x.g.addInPlace(o.g)
      bias.g.addInPlace(o.g.colSum)
    }

  def scale(x: Node, c: Double): Node =
    mk(x.v.scale(c), List(x)) { o => x.g.addInPlace(o.g.scale(c)) }

  def hadamard(a: Node, b: Node): Node =
    mk(a.v.hadamard(b.v), List(a, b)) { o =>
      a.g.addInPlace(o.g.hadamard(b.v))
      b.g.addInPlace(o.g.hadamard(a.v))
    }

  def relu(x: Node): Node =
    mk(x.v.map(v => if (v > 0) v else 0.0), List(x)) { o =>
      x.g.addInPlace(o.g.zipWith(x.v, (g, v) => if (v > 0) g else 0.0))
    }

  def leakyRelu(x: Node, alpha: Double): Node =
    mk(x.v.map(v => if (v > 0) v else alpha * v), List(x)) { o =>
      x.g.addInPlace(o.g.zipWith(x.v, (g, v) => if (v > 0) g else alpha * g))
    }

  def elu(x: Node, alpha: Double = 1.0): Node = {
    val out = x.v.map(v => if (v > 0) v else alpha * (math.exp(v) - 1.0))
    mk(out, List(x)) { o =>
      // d/dv = 1 for v>0 else out+alpha
      x.g.addInPlace(o.g.zipWith(
        new DMat(out.rows, out.cols,
          Array.tabulate(out.a.length)(i => if (x.v.a(i) > 0) 1.0 else out.a(i) + alpha)),
        _ * _))
    }
  }

  /** Select rows by `idx` (duplicates fine); backward scatter-adds. */
  def gatherRows(x: Node, idx: Array[Int]): Node =
    mk(x.v.selectRows(idx), List(x)) { o =>
      val c = x.v.cols
      var e = 0
      while (e < idx.length) {
        val src = e * c; val dst = idx(e) * c
        var j = 0
        while (j < c) { x.g.a(dst + j) += o.g.a(src + j); j += 1 }
        e += 1
      }
    }

  /** Sum rows of x (E×F) into nSeg buckets by `seg` (length E). */
  def segmentSum(x: Node, seg: Array[Int], nSeg: Int): Node = {
    require(seg.length == x.v.rows, "segmentSum: seg length must equal rows")
    val c = x.v.cols
    val out = DMat.zeros(nSeg, c)
    var e = 0
    while (e < seg.length) {
      val s = seg(e) * c; val o = e * c
      var j = 0
      while (j < c) { out.a(s + j) += x.v.a(o + j); j += 1 }
      e += 1
    }
    mk(out, List(x)) { o =>
      var e = 0
      while (e < seg.length) {
        val s = seg(e) * c; val d = e * c
        var j = 0
        while (j < c) { x.g.a(d + j) += o.g.a(s + j); j += 1 }
        e += 1
      }
    }
  }

  /** Divide row i by constant d(i) (no gradient through d). */
  def divRows(x: Node, d: Array[Double]): Node = {
    require(d.length == x.v.rows, "divRows length mismatch")
    val c = x.v.cols
    val out = x.v.copy
    var i = 0
    while (i < d.length) { var j = 0; while (j < c) { out.a(i * c + j) /= d(i); j += 1 }; i += 1 }
    mk(out, List(x)) { o =>
      var i = 0
      while (i < d.length) { var j = 0; while (j < c) { x.g.a(i * c + j) += o.g.a(i * c + j) / d(i); j += 1 }; i += 1 }
    }
  }

  /** Column-wise softmax within segments: for each column c and segment s,
    * out(e,c) = exp(x(e,c)) / Σ_{e'∈s} exp(x(e',c)). Used for GAT attention
    * (x is E×heads of logits, seg is the dst index per edge).
    */
  def segmentSoftmax(x: Node, seg: Array[Int], nSeg: Int): Node = {
    require(seg.length == x.v.rows, "segmentSoftmax: seg length must equal rows")
    val c = x.v.cols
    val mx = DMat.full(nSeg, c, Double.NegativeInfinity)
    var e = 0
    while (e < seg.length) {
      var j = 0
      while (j < c) { val s = seg(e); if (x.v(e, j) > mx(s, j)) mx(s, j) = x.v(e, j); j += 1 }
      e += 1
    }
    val den = DMat.zeros(nSeg, c)
    val expd = DMat.zeros(seg.length, c)
    e = 0
    while (e < seg.length) {
      var j = 0
      while (j < c) {
        val s = seg(e)
        val v = math.exp(x.v(e, j) - mx(s, j))
        expd(e, j) = v; den(s, j) += v
        j += 1
      }
      e += 1
    }
    val out = DMat.zeros(seg.length, c)
    e = 0
    while (e < seg.length) {
      var j = 0
      while (j < c) { out(e, j) = expd(e, j) / den(seg(e), j); j += 1 }
      e += 1
    }
    mk(out, List(x)) { o =>
      // d x_e = a_e * (g_e - Σ_{e' in seg} a_e' g_e')  per column
      val dot = DMat.zeros(nSeg, c)
      var k = 0
      while (k < seg.length) {
        var j = 0
        while (j < c) { dot(seg(k), j) += out(k, j) * o.g(k, j); j += 1 }
        k += 1
      }
      k = 0
      while (k < seg.length) {
        var j = 0
        while (j < c) { x.g(k, j) += out(k, j) * (o.g(k, j) - dot(seg(k), j)); j += 1 }
        k += 1
      }
    }
  }

  /** Multiply every row of x (E×F) by the scalar in w (E×1). */
  def mulBroadcastCol(x: Node, w: Node): Node = {
    require(w.v.cols == 1 && w.v.rows == x.v.rows, "mulBroadcastCol wants E×1 weights")
    val c = x.v.cols
    val out = DMat.zeros(x.v.rows, c)
    var e = 0
    while (e < x.v.rows) { var j = 0; while (j < c) { out(e, j) = x.v(e, j) * w.v(e, 0); j += 1 }; e += 1 }
    mk(out, List(x, w)) { o =>
      var k = 0
      while (k < x.v.rows) {
        var j = 0
        var acc = 0.0
        while (j < c) {
          x.g(k, j) += o.g(k, j) * w.v(k, 0)
          acc += o.g(k, j) * x.v(k, j)
          j += 1
        }
        w.g(k, 0) += acc
        k += 1
      }
    }
  }

  def concatCols(xs: Seq[Node]): Node = {
    require(xs.nonEmpty, "concatCols of nothing")
    val rows = xs.head.v.rows
    require(xs.forall(_.v.rows == rows), "concatCols: row mismatch")
    val widths = xs.map(_.v.cols)
    val total = widths.sum
    val out = DMat.zeros(rows, total)
    var off = 0
    xs.foreach { x =>
      var i = 0
      while (i < rows) { System.arraycopy(x.v.a, i * x.v.cols, out.a, i * total + off, x.v.cols); i += 1 }
      off += x.v.cols
    }
    mk(out, xs.toList) { o =>
      var off2 = 0
      xs.foreach { x =>
        var i = 0
        while (i < rows) {
          var j = 0
          while (j < x.v.cols) { x.g(i, j) += o.g(i, off2 + j); j += 1 }
          i += 1
        }
        off2 += x.v.cols
      }
    }
  }

  /** Mean softmax cross-entropy over rows; labels are class indices. */
  def softmaxCE(logits: Node, labels: Array[Int]): Node = {
    require(labels.length == logits.v.rows, "softmaxCE label count mismatch")
    val n = labels.length; val c = logits.v.cols
    val probs = DMat.zeros(n, c)
    var loss = 0.0
    var i = 0
    while (i < n) {
      var mx = Double.NegativeInfinity
      var j = 0
      while (j < c) { if (logits.v(i, j) > mx) mx = logits.v(i, j); j += 1 }
      var den = 0.0
      j = 0
      while (j < c) { val e = math.exp(logits.v(i, j) - mx); probs(i, j) = e; den += e; j += 1 }
      j = 0
      while (j < c) { probs(i, j) /= den; j += 1 }
      loss -= math.log(math.max(probs(i, labels(i)), 1e-300))
      i += 1
    }
    val out = new DMat(1, 1, Array(loss / n))
    mk(out, List(logits)) { o =>
      val up = o.g(0, 0)
      var k = 0
      while (k < n) {
        var j = 0
        while (j < c) {
          val oneHot = if (j == labels(k)) 1.0 else 0.0
          logits.g(k, j) += up * (probs(k, j) - oneHot) / n
          j += 1
        }
        k += 1
      }
    }
  }

  /** Mean element-wise sigmoid BCE against multi-hot targets y (N×C). */
  def sigmoidBCE(logits: Node, y: DMat): Node = {
    require(y.rows == logits.v.rows && y.cols == logits.v.cols, "sigmoidBCE shape mismatch")
    val n = logits.v.a.length
    var loss = 0.0
    var i = 0
    while (i < n) {
      val x = logits.v.a(i); val t = y.a(i)
      // stable: max(x,0) - x*t + log(1+exp(-|x|))
      loss += math.max(x, 0) - x * t + math.log1p(math.exp(-math.abs(x)))
      i += 1
    }
    val out = new DMat(1, 1, Array(loss / n))
    mk(out, List(logits)) { o =>
      val up = o.g(0, 0)
      var k = 0
      while (k < n) {
        val x = logits.v.a(k)
        val sig = 1.0 / (1.0 + math.exp(-x))
        logits.g.a(k) += up * (sig - y.a(k)) / n
        k += 1
      }
    }
  }

  /** Run backprop from a scalar loss node. */
  def backward(loss: Node): Unit = {
    require(loss.v.rows == 1 && loss.v.cols == 1, "backward from non-scalar")
    val topo = mutable.ArrayBuffer.empty[Node]
    val seen = mutable.HashSet.empty[Node]
    def dfs(n: Node): Unit = if (!seen.contains(n)) {
      seen += n
      n.parents.foreach(dfs)
      topo += n
    }
    dfs(loss)
    loss.g(0, 0) = 1.0
    topo.reverseIterator.foreach(_.back())
  }
}
