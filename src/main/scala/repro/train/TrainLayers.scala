package repro.train

import repro.core.{Act, GasLayer, GatLayer, SageLayer}
import repro.nn.{AD, DMat, Node}

/** A GNN layer in training form: autodiff forward over a local (sub)graph,
  * exportable to the GAS inference form via [[toInfer]] — the paper's
  * "computation flow shared between training and inference".
  */
trait TrainLayer {
  def params: Seq[Node]
  /** Forward over a local graph: x is N×in, (src,dst,w) the edge arrays. */
  def forward(x: Node, src: Array[Int], dst: Array[Int], w: Array[Double], n: Int): Node
  def toInfer: GasLayer
}

private object ActAd {
  def apply(act: Act, x: Node): Node = act match {
    case Act.Id   => x
    case Act.Relu => AD.relu(x)
    case Act.Elu  => AD.elu(x)
  }
}

/** GraphSAGE (mean aggregator) in training form. */
final class SageTrain(in: Int, out: Int, act: Act, seed: Long) extends TrainLayer {
  val wSelf: Node = AD.param(DMat.glorot(in, out, seed))
  val wNbr: Node = AD.param(DMat.glorot(in, out, seed + 1))
  val bias: Node = AD.param(DMat.zeros(1, out))
  def params: Seq[Node] = Seq(wSelf, wNbr, bias)

  def forward(x: Node, src: Array[Int], dst: Array[Int], w: Array[Double], n: Int): Node = {
    val msg = AD.gatherRows(x, src)
    val wNode = AD.input(new DMat(w.length, 1, w.clone()))
    val wmsg = AD.mulBroadcastCol(msg, wNode)
    val sums = AD.segmentSum(wmsg, dst, n)
    val wsum = new Array[Double](n)
    var e = 0
    while (e < dst.length) { wsum(dst(e)) += w(e); e += 1 }
    val div = wsum.map(v => if (v == 0.0) 1.0 else v) // isolated vertex → mean 0
    val mean = AD.divRows(sums, div)
    val lin = AD.addBias(AD.add(AD.matmul(x, wSelf), AD.matmul(mean, wNbr)), bias)
    ActAd(act, lin)
  }

  def toInfer: GasLayer = SageLayer(wSelf.v.copy, wNbr.v.copy, bias.v.copy, act)
}

/** Multi-head GAT in training form. Self-loops are appended internally
  * (the inference layer appends the self-message in `apply_node` instead —
  * the two are equivalent by construction and verified by tests).
  */
final class GatTrain(in: Int, outPerHead: Int, heads: Int, act: Act, combine: String,
                     leakyAlpha: Double, seed: Long) extends TrainLayer {
  require(combine == "concat" || combine == "mean", s"bad combine $combine")
  val w: Array[Node] = Array.tabulate(heads)(k => AD.param(DMat.glorot(in, outPerHead, seed + 10 * k)))
  val aSrc: Array[Node] = Array.tabulate(heads)(k => AD.param(DMat.randn(outPerHead, 1, 0.3, seed + 10 * k + 1)))
  val aDst: Array[Node] = Array.tabulate(heads)(k => AD.param(DMat.randn(outPerHead, 1, 0.3, seed + 10 * k + 2)))
  def params: Seq[Node] = (w ++ aSrc ++ aDst).toSeq

  def forward(x: Node, src0: Array[Int], dst0: Array[Int], w0: Array[Double], n: Int): Node = {
    // append self-loops
    val src = src0 ++ Array.tabulate(n)(identity)
    val dst = dst0 ++ Array.tabulate(n)(identity)
    val headOuts = (0 until heads).map { k =>
      val wh = AD.matmul(x, w(k))
      val sSrc = AD.matmul(wh, aSrc(k))
      val sDst = AD.matmul(wh, aDst(k))
      val logits = AD.leakyRelu(AD.add(AD.gatherRows(sSrc, src), AD.gatherRows(sDst, dst)), leakyAlpha)
      val alpha = AD.segmentSoftmax(logits, dst, n)
      val msg = AD.gatherRows(wh, src)
      AD.segmentSum(AD.mulBroadcastCol(msg, alpha), dst, n)
    }
    val combined =
      if (combine == "concat") AD.concatCols(headOuts)
      else headOuts.map(AD.scale(_, 1.0 / heads)).reduce(AD.add)
    ActAd(act, combined)
  }

  def toInfer: GasLayer =
    GatLayer(w.map(_.v.copy), aSrc.map(_.v.a.clone()), aDst.map(_.v.a.clone()), act, combine, leakyAlpha)
}
