package repro.batch

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{ArrayType, DoubleType, LongType}
import org.apache.spark.sql.Encoders
import repro.core._

/** InferTurbo on a batch-processing system (the paper's MapReduce/Spark
  * backend), expressed with the DataFrame API.
  *
  * One GNN layer per round. Within a round:
  *   1. scatter: each vertex computes its payload once (`scatter_nbrs`
  *      content);
  *   2. the edge table joins the payloads — the shuffle *is* the message
  *      delivery (out-edge info re-sent every round, as in the paper's
  *      stateless reduce);
  *   3. gather: with **partial-gather** a typed [[PooledUdaf]] combiner
  *      reduces map-side before the shuffle; without it, `groupByKey` +
  *      `mapGroups` ships every edge message to the receiver (no combining
  *      anywhere — the paper's no-combiner baseline) and the reduce runs in
  *      `apply_node`;
  *   4. `apply_node` updates the state; the new node table is persisted to
  *      external storage (parquet spill) before the next round, mirroring
  *      the paper's MR dataflow where no state lives in memory across
  *      rounds.
  *
  * Strategies:
  *  - `partialGather`: combiner on/off (exact either way);
  *  - `broadcastHubs`: the paper's broadcast strategy — payloads of
  *    vertices with out-degree > threshold are shipped once per worker via a
  *    Spark broadcast variable; their out-edges carry only the source id,
  *    and receivers look the payload up (the paper's identifier/lookup
  *    mechanism), so hub messages never cross the shuffle;
  *  - `shadowNodes`: the [[ShadowNodes]] mirror split, applied as
  *    preprocessing and undone on output.
  */
object BatchBackend {

  final case class BatchOpts(
      partialGather: Boolean = true,
      broadcastHubs: Boolean = false,
      shadowNodes: Boolean = false,
      lambda: Double = 0.1,
      numWorkers: Int = 64,
      spillDir: Option[String] = None)

  /** Full-graph inference; returns DataFrame(id LONG, h ARRAY&lt;DOUBLE&gt;). */
  def run(spark: SparkSession, nodes: DataFrame, edges: DataFrame, model: GnnModel,
          opts: BatchOpts = BatchOpts()): DataFrame = {
    val needThr = opts.broadcastHubs || opts.shadowNodes
    val thr = if (needThr) ShadowNodes.threshold(edges.count(), opts.numWorkers, opts.lambda) else 0L

    val (n0, e0) =
      if (opts.shadowNodes) {
        val s = ShadowNodes.transform(spark, nodes, edges, thr)
        (s.nodes, s.edges)
      } else (nodes, edges)

    val hubIds: Option[DataFrame] =
      if (opts.broadcastHubs) {
        val hubs = e0.groupBy("src").agg(count(lit(1)).as("deg"))
          .filter(col("deg") > thr).select(col("src").as("hid")).cache()
        if (hubs.count() > 0) Some(hubs) else None
      } else None

    val eCached = e0.select("src", "dst", "w").cache()
    var cur = n0.select(col("id"), col("feat").as("h"))
    var round = 0
    model.layers.foreach { layer =>
      val next = runRound(spark, cur, eCached, layer, opts, hubIds)
      cur = materialize(spark, next, opts, round)
      round += 1
    }
    // drop shadow mirrors: only ids present in the original node table
    val result =
      if (opts.shadowNodes) cur.join(nodes.select("id"), Seq("id"))
      else cur
    result.select("id", "h")
  }

  private def runRound(spark: SparkSession, cur: DataFrame, edges: DataFrame, layer: GasLayer,
                       opts: BatchOpts, hubIds: Option[DataFrame]): DataFrame = {
    val pg = opts.partialGather && layer.partialGather
    val payloadUdf = udf((h: Seq[Double]) => layer.scatterPayload(h.toArray).toSeq)
    val applyEdgeUdf = udf((p: Seq[Double], w: Double) => layer.applyEdge(p.toArray, w).toSeq)

    val payload = cur.select(col("id"), payloadUdf(col("h")).as("p"))

    // --- broadcast strategy: hub payloads leave via a broadcast variable,
    //     hub out-edges carry only (src, w) and receivers look payloads up
    val (restEdges, hubAggDf, hubLookup) = hubIds match {
      case Some(hubs) =>
        val rest = edges.join(broadcast(hubs), edges("src") === hubs("hid"), "left_anti")
        val hubEdges = edges.join(broadcast(hubs), edges("src") === hubs("hid"))
          .select(edges("src"), edges("dst"), edges("w"))
        val hubPayloads: Map[Long, Array[Double]] = payload
          .join(broadcast(hubs), payload("id") === hubs("hid"))
          .select(payload("id"), payload("p")).collect()
          .map(r => r.getLong(0) -> r.getSeq[Double](1).toArray).toMap
        val bc = spark.sparkContext.broadcast(hubPayloads)
        val hubAgg = hubEdges.groupBy("dst")
          .agg(collect_list(col("src")).as("hsrcs"), collect_list(col("w")).as("hws"))
          .select(col("dst").as("hdst"), col("hsrcs"), col("hws"))
        (rest, Some(hubAgg), Some(bc))
      case None => (edges, None, None)
    }

    val msgs = restEdges.join(payload, restEdges("src") === payload("id"))
      .select(restEdges("dst"), applyEdgeUdf(col("p"), restEdges("w")).as("m"), restEdges("w"))

    // receiver-side reconstruction of hub messages from the broadcast table
    val hubAggOf: (Seq[Long], Seq[Double]) => Agg = (hsrcs, hws) =>
      if (hsrcs == null || hubLookup.isEmpty) EmptyAgg
      else {
        val lookup = hubLookup.get.value
        hsrcs.zip(hws).foldLeft(EmptyAgg: Agg) { case (acc, (s, w)) =>
          val m = layer.applyEdge(lookup(s), w)
          Agg.merge(acc, if (pg) layer.initAgg(m, w) else Unioned(List((m, w))))
        }
      }

    val base: DataFrame =
      if (pg) {
        val pooled = udaf(new PooledUdaf, Encoders.product[MsgIn])
        val aggDf = msgs.groupBy("dst")
          .agg(pooled(col("m"), col("w")).as("agg"))
          .select(col("dst"), col("agg.sum").as("msum"), col("agg.wsum").as("mwsum"))
        cur.join(aggDf, cur("id") === aggDf("dst"), "left_outer")
      } else {
        // no combiner anywhere: every edge message crosses the shuffle and
        // the reduce happens entirely on the receiver (union semantics)
        import spark.implicits._
        val aggDf = msgs.toDF("_1", "_2", "_3").as[(Long, Seq[Double], Double)]
          .groupByKey(_._1)
          .mapGroups { (d, it) =>
            val buf = it.toVector
            (d, buf.map(_._2), buf.map(_._3))
          }
          .toDF("dst", "ms", "ws")
        cur.join(aggDf, cur("id") === aggDf("dst"), "left_outer")
      }

    val (joined, hsrcCol, hwsCol) = hubAggDf match {
      case Some(hDf) =>
        (base.join(hDf, cur("id") === hDf("hdst"), "left_outer"), col("hsrcs"), col("hws"))
      case None =>
        (base, lit(null).cast(ArrayType(LongType)), lit(null).cast(ArrayType(DoubleType)))
    }

    if (pg) {
      val applyPooled = udf((h: Seq[Double], sum: Seq[Double], wsum: Double,
                             hsrcs: Seq[Long], hws: Seq[Double]) => {
        val shuffled: Agg = if (sum == null) EmptyAgg else Pooled(sum.toArray, wsum)
        layer.applyNode(h.toArray, Agg.merge(shuffled, hubAggOf(hsrcs, hws))).toSeq
      })
      // coalesce the primitive input: Spark null-guards UDFs with primitive
      // params and would otherwise emit null h for in-degree-0 vertices
      joined.select(cur("id"),
        applyPooled(cur("h"), col("msum"), coalesce(col("mwsum"), lit(0.0)),
          hsrcCol, hwsCol).as("h"))
    } else {
      val applyUnion = udf((h: Seq[Double], ms: Seq[Seq[Double]], ws: Seq[Double],
                            hsrcs: Seq[Long], hws: Seq[Double]) => {
        val shuffled: Agg =
          if (ms == null || ms.isEmpty) EmptyAgg
          else Unioned(ms.zip(ws).map { case (m, w) => (m.toArray, w) }.toList)
        layer.applyNode(h.toArray, Agg.merge(shuffled, hubAggOf(hsrcs, hws))).toSeq
      })
      joined.select(cur("id"),
        applyUnion(cur("h"), col("ms"), col("ws"), hsrcCol, hwsCol).as("h"))
    }
  }

  /** Between rounds the MR backend keeps no state in memory: spill the node
    * table to parquet and read it back (external-storage dataflow). Without
    * a spill dir, localCheckpoint still cuts the lineage so rounds stay
    * independent.
    */
  private def materialize(spark: SparkSession, df: DataFrame, opts: BatchOpts, round: Int): DataFrame =
    opts.spillDir match {
      case Some(dir) =>
        val path = s"$dir/round_$round"
        df.write.mode("overwrite").parquet(path)
        spark.read.parquet(path)
      case None =>
        df.localCheckpoint(true)
    }
}
