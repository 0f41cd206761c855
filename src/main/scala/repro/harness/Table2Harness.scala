package repro.harness

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{GnnModel, LocalGraph}
import repro.graphgen.{GraphGen, GraphSpec}
import repro.khop.{SampleCfg, TraditionalPipeline}
import repro.metrics.Metrics
import repro.pregel.PregelBackend
import repro.train.Trainer
import repro.train.Trainer.TrainCfg

/** Table II — prediction performance of SAGE/GAT across inference pipelines.
  *
  * One model is trained per (algorithm, dataset) with mini-batch k-hop
  * sampling; the *same* weights are then served by three pipelines:
  *  - PyG-sim  : traditional sampled inference, multiset frontier
  *  - DGL-sim  : traditional sampled inference, deduped frontier
  *  - Ours     : full-graph InferTurbo (Pregel backend), no sampling
  * The paper's claim is comparability across pipelines, which transfers to
  * the stand-in datasets.
  */
object Table2Harness {

  final case class Config(
      ppiScale: Double = 1.0, productScale: Double = 0.5, magScale: Double = 0.25,
      epochs: Int = 20, trainFrac: Double = 0.3, inferFanout: Int = 15, batchSize: Int = 512)

  final case class CellSet(pyg: Double, dgl: Double, ours: Double)

  /** Paper Table II values, for side-by-side reporting. */
  val paper: Map[(String, String), CellSet] = Map(
    ("SAGE", "PPI") -> CellSet(0.878, 0.878, 0.880),
    ("SAGE", "Product") -> CellSet(0.787, 0.790, 0.788),
    ("SAGE", "MAG240M") -> CellSet(0.662, 0.664, 0.668),
    ("GAT", "PPI") -> CellSet(0.987, 0.981, 0.986),
    ("GAT", "Product") -> CellSet(0.794, 0.800, 0.801),
    ("GAT", "MAG240M") -> CellSet(0.663, 0.659, 0.670),
  )

  def evalMap(results: Map[Long, Array[Double]], g: LocalGraph, testIdx: Array[Int],
              model: GnnModel): Double = {
    if (model.multiLabel) {
      val pred = testIdx.map(i => model.predictMulti(results(g.ids(i))))
      val truth = testIdx.map(i => g.y.row(i).map(_ > 0.5))
      Metrics.microF1(pred, truth)
    } else {
      val pred = testIdx.map(i => model.predict(results(g.ids(i))))
      Metrics.accuracy(pred, testIdx.map(g.yIdx))
    }
  }

  def collectH(df: DataFrame): Map[Long, Array[Double]] =
    df.collect().map(r => r.getLong(0) -> r.getSeq[Double](1).toArray).toMap

  /** Measured cells for one (algo, dataset). */
  def runOne(spark: SparkSession, algo: String, dsName: String, spec: GraphSpec,
             cfg: Config): CellSet = {
    val nodes = GraphGen.nodes(spark, spec).cache()
    val edges = GraphGen.edges(spark, spec).cache()
    val local = GraphGen.toLocal(nodes, edges, spec.nClasses)
    val (trainIdx, testIdx) = Trainer.split(local, cfg.trainFrac, spec.seed + 1)

    val hidden = 32
    // small datasets get proportionally more epochs so every config sees a
    // comparable number of optimizer steps
    val epochs = if (spec.nNodes < 3000) cfg.epochs * 4 else cfg.epochs
    val tc = TrainCfg(
      algo = algo.toLowerCase, dims = Seq(spec.featDim, hidden, spec.nClasses),
      heads = 2, epochs = epochs, batchSize = 128, fanout = 10, lr = 1e-2,
      multiLabel = spec.multiLabel, seed = spec.seed + 2)
    val (model, _) = Trainer.train(local, trainIdx, tc)

    def traditional(dedup: Boolean): Double = {
      val sCfg = SampleCfg(hops = model.hops, fanout = cfg.inferFanout,
        dedupFrontier = dedup, seed = None)
      val (res, _) = TraditionalPipeline.infer(spark, nodes, edges, model, sCfg,
        cfg.batchSize, spec.nClasses)
      evalMap(res, local, testIdx, model)
    }

    val pyg = traditional(dedup = false)
    val dgl = traditional(dedup = true)
    val ours = evalMap(collectH(PregelBackend.run(spark, nodes, edges, model)),
      local, testIdx, model)
    nodes.unpersist(); edges.unpersist()
    CellSet(pyg, dgl, ours)
  }

  def run(spark: SparkSession, cfg: Config = Config()): String = {
    val datasets = Seq(
      ("PPI", GraphGen.ppiLite(cfg.ppiScale)),
      ("Product", GraphGen.productLite(cfg.productScale)),
      ("MAG240M", GraphGen.magLite(cfg.magScale)),
    )
    val rows = for {
      algo <- Seq("SAGE", "GAT")
      (ds, spec) <- datasets
    } yield {
      val m = runOne(spark, algo, ds, spec, cfg)
      val p = paper((algo, ds))
      Seq(algo, ds,
        f"${p.pyg}%.3f", f"${m.pyg}%.3f",
        f"${p.dgl}%.3f", f"${m.dgl}%.3f",
        f"${p.ours}%.3f", f"${m.ours}%.3f")
    }
    "Table II - performance (micro-F1 for PPI, accuracy otherwise); paper vs measured\n" +
      TableFmt.format(
        Seq("algo", "dataset", "PyG(paper)", "PyG-sim", "DGL(paper)", "DGL-sim",
          "Ours(paper)", "Ours"),
        rows)
  }
}
