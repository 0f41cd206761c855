package repro.train

import repro.core.{Act, GnnModel, LocalGraph}
import repro.nn.{AD, Adam, DMat, Node}
import scala.collection.mutable

/** Mini-batch k-hop-sampled GNN training (the paper's training phase).
  *
  * As in the paper, only a small labeled fraction trains; each step samples
  * a batch of labeled targets, builds their fanout-sampled k-hop
  * in-neighborhood, and runs the localized forward/backward. The training
  * graph is materialized on the driver (laptop-scale substitution for the
  * paper's training workers — each of which also holds its mini-batch
  * subgraphs locally).
  */
object Trainer {

  final case class TrainCfg(
      algo: String, // "sage" | "gat"
      dims: Seq[Int], // featDim, hidden..., nClasses
      heads: Int = 2,
      epochs: Int = 20,
      batchSize: Int = 256,
      fanout: Int = 10,
      lr: Double = 5e-3,
      multiLabel: Boolean = false,
      seed: Long = 42L)

  def buildLayers(cfg: TrainCfg): Seq[TrainLayer] = {
    require(cfg.dims.size >= 2, "need at least in/out dims")
    cfg.dims.sliding(2).toSeq.zipWithIndex.map { case (Seq(in, out), i) =>
      val last = i == cfg.dims.size - 2
      cfg.algo match {
        case "sage" =>
          new SageTrain(in, out, if (last) Act.Id else Act.Relu, cfg.seed + 100 * i)
        case "gat" =>
          if (last) new GatTrain(in, out, cfg.heads, Act.Id, "mean", 0.2, cfg.seed + 100 * i)
          else {
            require(out % cfg.heads == 0, s"hidden dim $out not divisible by ${cfg.heads} heads")
            new GatTrain(in, out / cfg.heads, cfg.heads, Act.Elu, "concat", 0.2, cfg.seed + 100 * i)
          }
        case other => throw new IllegalArgumentException(s"unknown algo $other")
      }
    }
  }

  /** Deterministic train/test split over local indices. */
  def split(g: LocalGraph, trainFrac: Double, seed: Long): (Array[Int], Array[Int]) = {
    val rng = new java.util.Random(seed)
    val perm = Array.tabulate(g.n)(identity)
    var i = perm.length - 1
    while (i > 0) { val j = rng.nextInt(i + 1); val t = perm(i); perm(i) = perm(j); perm(j) = t; i -= 1 }
    val k = math.max(1, (g.n * trainFrac).toInt)
    (perm.take(k), perm.drop(k))
  }

  /** Fanout-sampled k-hop subgraph on the local CSR (frontier deduped). */
  def sampleSubgraph(g: LocalGraph, targets: Array[Int], hops: Int, fanout: Int,
                     rng: java.util.Random): (Array[Int], Array[Int], Array[Int], Array[Double], Array[Int]) = {
    val keepEdges = mutable.LinkedHashSet.empty[Int]
    val seen = mutable.LinkedHashSet.empty[Int]
    targets.foreach(seen += _)
    var frontier: Array[Int] = targets.distinct
    (0 until hops).foreach { _ =>
      val next = mutable.LinkedHashSet.empty[Int]
      frontier.foreach { v =>
        val es = g.inEdgesOf(v)
        val chosen =
          if (fanout > 0 && es.length > fanout) {
            // partial Fisher–Yates over a copy
            val c = es.clone()
            var i = 0
            while (i < fanout) { val j = i + rng.nextInt(c.length - i); val t = c(i); c(i) = c(j); c(j) = t; i += 1 }
            c.take(fanout)
          } else es
        chosen.foreach { e =>
          keepEdges += e
          val s = g.src(e)
          if (!seen.contains(s)) { seen += s; next += s }
        }
      }
      frontier = next.toArray
    }
    val nodesArr = seen.toArray
    val idx = nodesArr.zipWithIndex.toMap
    val es = keepEdges.toArray
    val src = es.map(e => idx(g.src(e)))
    val dst = es.map(e => idx(g.dst(e)))
    val w = es.map(g.w)
    val targetPos = targets.map(idx)
    (nodesArr, src, dst, w, targetPos)
  }

  /** Train and export the GAS inference model. Returns (model, loss curve). */
  def train(g: LocalGraph, trainIdx: Array[Int], cfg: TrainCfg): (GnnModel, Seq[Double]) = {
    val layers = buildLayers(cfg)
    val adam = new Adam(layers.flatMap(_.params), cfg.lr)
    val rng = new java.util.Random(cfg.seed)
    val hops = cfg.dims.size - 1
    val losses = mutable.ArrayBuffer.empty[Double]

    (0 until cfg.epochs).foreach { _ =>
      val order = trainIdx.clone()
      var i = order.length - 1
      while (i > 0) { val j = rng.nextInt(i + 1); val t = order(i); order(i) = order(j); order(j) = t; i -= 1 }
      order.grouped(cfg.batchSize).foreach { batch =>
        val (nodesArr, src, dst, w, tPos) = sampleSubgraph(g, batch, hops, cfg.fanout, rng)
        var h: Node = AD.input(g.x.selectRows(nodesArr))
        layers.foreach { l => h = l.forward(h, src, dst, w, nodesArr.length) }
        val logits = AD.gatherRows(h, tPos)
        val loss =
          if (cfg.multiLabel) {
            val y = DMat.fromRows(batch.toIndexedSeq.map(g.y.row))
            AD.sigmoidBCE(logits, y)
          } else {
            AD.softmaxCE(logits, batch.map(g.yIdx))
          }
        adam.zeroGrad()
        AD.backward(loss)
        adam.step()
        losses += loss.v(0, 0)
      }
    }
    (GnnModel(layers.map(_.toInfer), cfg.multiLabel), losses.toSeq)
  }

  /** Full-graph training-form forward (no sampling) — used by tests to
    * check training/inference computation-flow equivalence.
    */
  def fullForward(g: LocalGraph, layers: Seq[TrainLayer]): DMat = {
    var h: Node = AD.input(g.x.copy)
    layers.foreach { l => h = l.forward(h, g.src, g.dst, g.w, g.n) }
    h.v
  }
}
