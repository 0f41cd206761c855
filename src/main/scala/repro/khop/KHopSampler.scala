package repro.khop

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Simulated OOM: the materialized k-hop neighborhood exceeded the memory
  * budget of the (simulated) inference worker. Stands in for the real OOM
  * crash the paper reports for nbr10000 / 3 hops (Table IV).
  */
final case class OomSimulated(gatheredRows: Long, budget: Long)
  extends RuntimeException(s"simulated OOM: gathered $gatheredRows rows > budget $budget")

/** Sampling / expansion configuration of the traditional k-hop pipeline.
  *
  * @param fanout        max in-neighbors sampled per frontier occurrence
  *                      (-1 = keep all, the "no sampling" upper end)
  * @param dedupFrontier true dedups the frontier each hop (DGL-style block
  *                      building); false keeps the multiset frontier
  *                      (per-target expansion, PyG-style) so overlapping
  *                      neighborhoods are re-expanded — the redundant
  *                      computation the paper eliminates
  * @param seed          None = fresh randomness per run (the paper's
  *                      inconsistency phenomenon); Some(s) = reproducible
  * @param maxGatherRows memory budget; exceeding it raises [[OomSimulated]]
  */
final case class SampleCfg(
    hops: Int,
    fanout: Int = -1,
    dedupFrontier: Boolean = true,
    seed: Option[Long] = None,
    maxGatherRows: Long = Long.MaxValue)

final case class SampleStats(gatheredRows: Long, joinRows: Long)

/** Distributed k-hop neighborhood expansion over the edge table.
  *
  * A GNN gathers over in-edges, so hop expansion walks edges backwards:
  * frontier vertices join as `dst`, their `src`s become the next frontier.
  * Returns the union edge set of the sampled neighborhood — running all k
  * layers on that union subgraph yields exact target embeddings when
  * `fanout = -1` (every in-edge of every vertex at depth < k is present).
  */
object KHopSampler {

  def subgraphEdges(spark: SparkSession, edges: DataFrame, targets: DataFrame,
                    cfg: SampleCfg): (DataFrame, SampleStats) = {
    require(cfg.hops >= 1, "need at least one hop")
    // stable per-row edge ids so the final dedup removes only *re-sampled*
    // edges across hops, never genuine multi-edges of the input graph;
    // cache pins the monotonically_increasing_id assignment
    val edgesU = edges.select(col("src"), col("dst"), col("w"))
      .withColumn("eid", monotonically_increasing_id()).cache()
    var frontier = targets.select(monotonically_increasing_id().as("occ"), col("id").as("nid"))
    var gathered = 0L
    var joined = 0L
    val perHop = scala.collection.mutable.ArrayBuffer.empty[DataFrame]

    (0 until cfg.hops).foreach { hop =>
      val inc = edgesU.join(frontier, edgesU("dst") === frontier("nid"))
        .select(col("occ"), edgesU("src"), edgesU("dst"), edgesU("w"), edgesU("eid"))
      joined += inc.count()

      val sampled =
        if (cfg.fanout > 0) {
          val ord = cfg.seed.map(s => rand(s + hop)).getOrElse(rand())
          val wnd = Window.partitionBy("occ").orderBy(ord)
          inc.withColumn("rk", row_number().over(wnd)).filter(col("rk") <= cfg.fanout)
            .drop("rk").cache()
        } else inc.cache()

      gathered += sampled.count()
      if (gathered > cfg.maxGatherRows) throw OomSimulated(gathered, cfg.maxGatherRows)
      perHop += sampled.select("src", "dst", "w", "eid")

      frontier =
        if (cfg.dedupFrontier)
          sampled.select(col("src").as("nid")).distinct()
            .select(monotonically_increasing_id().as("occ"), col("nid"))
        else
          sampled.select(monotonically_increasing_id().as("occ"), col("src").as("nid"))
    }

    val union = perHop.reduce(_ union _).distinct().select("src", "dst", "w")
    (union, SampleStats(gathered, joined))
  }
}
