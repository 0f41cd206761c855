package repro.train

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{GnnModel, LocalInference, LocalGraph}
import repro.metrics.Metrics
import repro.nn.DMat
import repro.graphgen.{GraphGen, GraphSpec}

class TrainerSpec extends AnyFunSuite {

  /** Homophily graph materialized locally without Spark (drives the same
    * deterministic generator functions).
    */
  private def localGraph(spec: GraphSpec): LocalGraph = {
    val cents = GraphGen.centroids(spec)
    val n = spec.nNodes.toInt
    val x = DMat.fromRows((0L until n.toLong).map(i => GraphGen.featuresOf(spec, cents, i).toArray))
    val y = DMat.zeros(n, spec.nClasses)
    val yIdx = Array.tabulate(n)(i => GraphGen.classOf(spec, i.toLong))
    (0 until n).foreach(i => GraphGen.activeClasses(spec, i.toLong).foreach(c => y(i, c) = 1.0))
    val es = (0L until n.toLong).flatMap(i => GraphGen.outEdgesOf(spec, i).map { case (d, w) => (i.toInt, d.toInt, w) })
    LocalGraph(n, Array.tabulate(n)(_.toLong),
      es.map(_._1).toArray, es.map(_._2).toArray, es.map(_._3).toArray, x, y, yIdx)
  }

  private val spec = GraphSpec(nNodes = 600, avgOutDeg = 8, featDim = 8, nClasses = 4,
    homophily = 0.7, noise = 0.8, seed = 21L)
  private lazy val g = localGraph(spec)

  test("split is a deterministic partition") {
    val (tr1, te1) = Trainer.split(g, 0.3, 1)
    val (tr2, te2) = Trainer.split(g, 0.3, 1)
    assert(tr1.toSeq == tr2.toSeq && te1.toSeq == te2.toSeq)
    assert((tr1 ++ te1).sorted.toSeq == (0 until g.n))
    assert(math.abs(tr1.length - g.n * 0.3) < 2)
  }

  test("sampleSubgraph respects fanout and contains the targets") {
    val rng = new java.util.Random(2)
    val targets = Array(0, 5, 10)
    val (nodes, src, dst, w, tPos) = Trainer.sampleSubgraph(g, targets, hops = 2, fanout = 3, rng)
    assert(tPos.map(nodes).toSeq == targets.toSeq)
    assert(src.length == dst.length && w.length == src.length)
    // fanout bound: each vertex keeps at most 3 in-edges per hop expansion
    val inCnt = dst.groupBy(identity).view.mapValues(_.length)
    // a vertex can be expanded at several hops; bound is fanout * hops
    assert(inCnt.values.forall(_ <= 6))
  }

  test("sampleSubgraph with unlimited fanout covers the 2-hop in-neighborhood") {
    val rng = new java.util.Random(3)
    val targets = Array(7)
    val (nodes, _, _, _, _) = Trainer.sampleSubgraph(g, targets, hops = 2, fanout = -1, rng)
    val hop1 = g.inEdgesOf(7).map(g.src).toSet
    val hop2 = hop1.flatMap(v => g.inEdgesOf(v).map(g.src))
    assert((hop1 ++ hop2 + 7).subsetOf(nodes.toSet))
  }

  test("SAGE training reduces loss and beats the random baseline") {
    val (trainIdx, testIdx) = Trainer.split(g, 0.4, 5)
    val cfg = Trainer.TrainCfg("sage", Seq(spec.featDim, 16, spec.nClasses),
      epochs = 12, batchSize = 128, fanout = 8, lr = 1e-2, seed = 31)
    val (model, losses) = Trainer.train(g, trainIdx, cfg)
    val early = losses.take(5).sum / 5
    val late = losses.takeRight(5).sum / 5
    assert(late < early, s"loss did not decrease: $early -> $late")
    val out = LocalInference.forward(g, model)
    val pred = testIdx.map(i => model.predict(out.row(i)))
    val acc = Metrics.accuracy(pred, testIdx.map(g.yIdx))
    assert(acc > 0.45, s"accuracy too low: $acc (random = ${1.0 / spec.nClasses})")
  }

  test("GAT training reduces loss") {
    val (trainIdx, _) = Trainer.split(g, 0.4, 6)
    val cfg = Trainer.TrainCfg("gat", Seq(spec.featDim, 8, spec.nClasses),
      heads = 2, epochs = 4, batchSize = 128, fanout = 5, lr = 1e-2, seed = 32)
    val (model, losses) = Trainer.train(g, trainIdx, cfg)
    assert(model.hops == 2)
    assert(losses.takeRight(3).sum < losses.take(3).sum)
  }

  test("multi-label training reduces BCE and yields usable micro-F1") {
    val mlSpec = spec.copy(multiLabel = true, nClasses = 6, seed = 22L)
    val mg = localGraph(mlSpec)
    val (trainIdx, testIdx) = Trainer.split(mg, 0.4, 7)
    val cfg = Trainer.TrainCfg("sage", Seq(mlSpec.featDim, 16, mlSpec.nClasses),
      epochs = 10, batchSize = 128, fanout = 8, lr = 1e-2, multiLabel = true, seed = 33)
    val (model, losses) = Trainer.train(mg, trainIdx, cfg)
    assert(model.multiLabel)
    assert(losses.last < losses.head)
    val out = LocalInference.forward(mg, model)
    val pred = testIdx.map(i => model.predictMulti(out.row(i)))
    val truth = testIdx.map(i => mg.y.row(i).map(_ > 0.5))
    assert(Metrics.microF1(pred, truth) > 0.3)
  }

  test("trained model hops equals dims-1") {
    val (trainIdx, _) = Trainer.split(g, 0.2, 8)
    val cfg = Trainer.TrainCfg("sage", Seq(spec.featDim, 8, 8, spec.nClasses),
      epochs = 1, batchSize = 256, fanout = 4, seed = 34)
    val (model, _) = Trainer.train(g, trainIdx, cfg)
    assert(model.hops == 3 && model.outDim == spec.nClasses)
  }
}
