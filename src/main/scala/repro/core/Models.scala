package repro.core

import repro.nn.DMat

/** Factories for randomly initialized inference models — enough for the
  * cost/scalability experiments (Tables III/IV measure time and resources,
  * which do not depend on the weight values), and for backend-equivalence
  * tests.
  */
object Models {

  /** k-layer GraphSAGE: dims = featDim, hidden..., out. */
  def sage(dims: Seq[Int], seed: Long = 1L): GnnModel = {
    require(dims.size >= 2, "need at least in/out dims")
    val layers = dims.sliding(2).toSeq.zipWithIndex.map { case (Seq(in, out), i) =>
      val last = i == dims.size - 2
      SageLayer(
        DMat.glorot(in, out, seed + 3 * i),
        DMat.glorot(in, out, seed + 3 * i + 1),
        DMat.randn(1, out, 0.1, seed + 3 * i + 2),
        if (last) Act.Id else Act.Relu)
    }
    GnnModel(layers)
  }

  /** k-layer GAT: hidden layers concat `heads` heads (dim must divide),
    * final layer averages heads.
    */
  def gat(dims: Seq[Int], heads: Int = 2, seed: Long = 2L): GnnModel = {
    require(dims.size >= 2, "need at least in/out dims")
    val layers = dims.sliding(2).toSeq.zipWithIndex.map { case (Seq(in, out), i) =>
      val last = i == dims.size - 2
      val (perHead, combine) =
        if (last) (out, "mean")
        else { require(out % heads == 0, s"dim $out not divisible by $heads heads"); (out / heads, "concat") }
      GatLayer(
        Array.tabulate(heads)(k => DMat.glorot(in, perHead, seed + 10 * i + k)),
        Array.tabulate(heads)(k => DMat.randn(perHead, 1, 0.3, seed + 10 * i + k + 100).a),
        Array.tabulate(heads)(k => DMat.randn(perHead, 1, 0.3, seed + 10 * i + k + 200).a),
        if (last) Act.Id else Act.Elu,
        combine)
    }
    GnnModel(layers)
  }
}
