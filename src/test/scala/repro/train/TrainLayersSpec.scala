package repro.train

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.nn.{AD, DMat}

/** The paper's central unification claim: the computation flow is *shared*
  * between mini-batch training and full-graph inference. These tests verify
  * that the autodiff training forward and the exported GAS inference layers
  * compute identical functions.
  */
class TrainLayersSpec extends AnyFunSuite {

  private def graph(n: Int, e: Int, f: Int, seed: Long) = TinyGraphs.random(n, e, f, seed)

  test("SAGE: training forward == GAS inference forward (1 layer)") {
    val g = graph(30, 120, 6, 1)
    val l = new SageTrain(6, 4, Act.Relu, seed = 5)
    val trainOut = Trainer.fullForward(g, Seq(l))
    val inferOut = LocalInference.forward(g, GnnModel(Seq(l.toInfer)))
    assert(trainOut.maxAbsDiff(inferOut) < 1e-10)
  }

  test("SAGE: training forward == GAS inference forward (2 layers, weighted edges)") {
    val g = graph(25, 100, 5, 2)
    val ls = Seq(new SageTrain(5, 8, Act.Relu, 6), new SageTrain(8, 3, Act.Id, 7))
    val trainOut = Trainer.fullForward(g, ls)
    val inferOut = LocalInference.forward(g, GnnModel(ls.map(_.toInfer)))
    assert(trainOut.maxAbsDiff(inferOut) < 1e-10)
  }

  test("GAT: training forward (self-loops) == GAS inference forward (self-message)") {
    val g = graph(20, 80, 5, 3)
    val l = new GatTrain(5, 3, heads = 2, Act.Elu, "concat", 0.2, seed = 8)
    val trainOut = Trainer.fullForward(g, Seq(l))
    val inferOut = LocalInference.forward(g, GnnModel(Seq(l.toInfer)))
    assert(trainOut.maxAbsDiff(inferOut) < 1e-9)
  }

  test("GAT: 2-layer stack equivalence incl. mean-combine output layer") {
    val g = graph(18, 60, 4, 4)
    val ls = Seq(
      new GatTrain(4, 3, heads = 2, Act.Elu, "concat", 0.2, 9),
      new GatTrain(6, 3, heads = 2, Act.Id, "mean", 0.2, 10))
    val trainOut = Trainer.fullForward(g, ls)
    val inferOut = LocalInference.forward(g, GnnModel(ls.map(_.toInfer)))
    assert(trainOut.maxAbsDiff(inferOut) < 1e-9)
  }

  test("mixed stack SAGE->GAT equivalence") {
    val g = graph(22, 70, 6, 5)
    val ls = Seq(
      new SageTrain(6, 4, Act.Relu, 11),
      new GatTrain(4, 2, heads = 2, Act.Id, "mean", 0.2, 12))
    assert(Trainer.fullForward(g, ls)
      .maxAbsDiff(LocalInference.forward(g, GnnModel(ls.map(_.toInfer)))) < 1e-9)
  }

  test("SAGE end-to-end gradients pass the finite-difference check") {
    val g = graph(12, 40, 4, 6)
    val l = new SageTrain(4, 3, Act.Relu, 13)
    def build() = {
      val out = l.forward(AD.input(g.x.copy), g.src, g.dst, g.w, g.n)
      AD.softmaxCE(out, Array.tabulate(g.n)(i => i % 3))
    }
    repro.nn.Grad.check(l.params, build _)
  }

  test("GAT end-to-end gradients pass the finite-difference check") {
    val g = graph(10, 30, 3, 7)
    val l = new GatTrain(3, 2, heads = 2, Act.Elu, "concat", 0.2, 14)
    def build() = {
      val out = l.forward(AD.input(g.x.copy), g.src, g.dst, g.w, g.n)
      AD.softmaxCE(out, Array.tabulate(g.n)(i => i % 4))
    }
    repro.nn.Grad.check(l.params, build _, tol = 1e-3)
  }

  test("toInfer exports copies — later training steps don't mutate the export") {
    val l = new SageTrain(3, 2, Act.Id, 15)
    val snap = l.toInfer.asInstanceOf[SageLayer]
    l.wSelf.v.a(0) += 100.0
    assert(snap.wSelf.a(0) != l.wSelf.v.a(0))
  }

  test("GatTrain isolated vertex matches inference self-message") {
    // vertex 0 of TinyGraphs.random has no in-edges
    val g = graph(8, 20, 3, 8)
    val l = new GatTrain(3, 2, heads = 1, Act.Id, "mean", 0.2, 16)
    val trainOut = Trainer.fullForward(g, Seq(l))
    val infer = l.toInfer
    val expect = infer.applyNode(g.x.row(0), EmptyAgg)
    assert(trainOut.row(0).zip(expect).forall { case (a, b) => math.abs(a - b) < 1e-10 })
  }

  test("buildLayers honors algo/dims/head constraints") {
    val sage = Trainer.buildLayers(Trainer.TrainCfg("sage", Seq(8, 4, 2)))
    assert(sage.size == 2 && sage.forall(_.isInstanceOf[SageTrain]))
    val gat = Trainer.buildLayers(Trainer.TrainCfg("gat", Seq(8, 4, 2), heads = 2))
    assert(gat.size == 2 && gat.forall(_.isInstanceOf[GatTrain]))
    intercept[IllegalArgumentException](
      Trainer.buildLayers(Trainer.TrainCfg("gat", Seq(8, 5, 2), heads = 2)))
    intercept[IllegalArgumentException](
      Trainer.buildLayers(Trainer.TrainCfg("gcnx", Seq(8, 2))))
  }

  test("DMat copy semantics inside toInfer for GAT") {
    val l = new GatTrain(3, 2, heads = 1, Act.Id, "mean", 0.2, 17)
    val snap = l.toInfer.asInstanceOf[GatLayer]
    l.w(0).v.a(0) += 5.0
    l.aSrc(0).v.a(0) += 5.0
    assert(snap.w(0).a(0) != l.w(0).v.a(0))
    assert(snap.aSrc(0)(0) != l.aSrc(0).v.a(0))
  }
}
