package repro.khop

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{GnnModel, LocalInference}
import repro.graphgen.GraphGen

/** Per-run accounting of the traditional pipeline, used by the Table III/IV
  * benches: `nodeLayerComputations` counts (vertex, layer) forward
  * evaluations — the redundancy metric (full-graph inference does exactly
  * N·k of them; the traditional pipeline re-evaluates overlap).
  */
final case class PipelineStats(
    batches: Int,
    subgraphNodes: Long,
    subgraphEdges: Long,
    nodeLayerComputations: Long,
    gatheredRows: Long,
    joinRows: Long,
    sampleWallMs: Long,
    forwardWallMs: Long)

/** The traditional training-style inference pipeline (the PyG/DGL stand-in):
  * process the full vertex set in mini-batches; for each batch, sample the
  * k-hop in-neighborhood, materialize it as a local subgraph (the "graph
  * store query"), and run the localized k-layer forward on it.
  *
  * With `fanout = -1` this is exact but redundant (overlapping
  * neighborhoods are recomputed per batch); with sampling it is fast but
  * stochastic — both phenomena the paper measures against.
  */
object TraditionalPipeline {

  /** Infer embeddings for every vertex. Returns (id → logits, stats).
    * Throws [[OomSimulated]] if any batch exceeds the memory budget.
    */
  def infer(spark: SparkSession, nodes: DataFrame, edges: DataFrame, model: GnnModel,
            cfg: SampleCfg, batchSize: Int, nClasses: Int): (Map[Long, Array[Double]], PipelineStats) = {
    import spark.implicits._
    val allIds = nodes.select("id").as[Long].collect().sorted
    val results = scala.collection.mutable.HashMap.empty[Long, Array[Double]]
    var subN = 0L; var subE = 0L; var comp = 0L; var gath = 0L; var join = 0L
    var sampleMs = 0L; var fwdMs = 0L
    var batches = 0

    allIds.grouped(batchSize).foreach { batchIds =>
      batches += 1
      val targets = batchIds.toSeq.toDF("id")

      val t0 = System.nanoTime()
      val (subEdges, st) = KHopSampler.subgraphEdges(spark, edges, targets, cfg)
      val subIds = subEdges.select($"src".as("id"))
        .union(subEdges.select($"dst".as("id")))
        .union(targets)
        .distinct()
      val subNodes = nodes.join(subIds, Seq("id"))
      val local = GraphGen.toLocal(subNodes, subEdges, nClasses)
      sampleMs += (System.nanoTime() - t0) / 1000000L

      val t1 = System.nanoTime()
      val out = LocalInference.forward(local, model)
      fwdMs += (System.nanoTime() - t1) / 1000000L

      val pos = local.ids.zipWithIndex.toMap
      batchIds.foreach { id => results(id) = out.row(pos(id)) }

      subN += local.n; subE += local.nEdges
      comp += local.n.toLong * model.hops
      gath += st.gatheredRows; join += st.joinRows
    }
    (results.toMap,
      PipelineStats(batches, subN, subE, comp, gath, join, sampleMs, fwdMs))
  }
}
