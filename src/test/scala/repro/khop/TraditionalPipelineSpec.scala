package repro.khop

import repro.SparkSpec
import repro.BackendTestUtil.fixture
import repro.core.Models
import repro.graphgen.GraphSpec

class TraditionalPipelineSpec extends SparkSpec {

  private lazy val fix = fixture(spark, GraphSpec(nNodes = 120, avgOutDeg = 4, featDim = 5,
    nClasses = 3, homophily = 0.4, seed = 93L))
  private lazy val model = Models.sage(Seq(5, 4, 3))

  test("full-fanout k-hop inference is exact for every vertex (multi-batch)") {
    val (res, st) = TraditionalPipeline.infer(spark, fix.nodes, fix.edges, model,
      SampleCfg(hops = 2, fanout = -1), batchSize = 50, nClasses = 3)
    val ref = fix.reference(model)
    assert(st.batches == 3)
    (0 until fix.local.n).foreach { i =>
      val got = res(fix.local.ids(i))
      got.zip(ref.row(i)).foreach { case (a, b) =>
        assert(math.abs(a - b) < 1e-8, s"vertex ${fix.local.ids(i)}")
      }
    }
  }

  test("redundant computation: node-layer evaluations exceed the full-graph count") {
    val (_, st) = TraditionalPipeline.infer(spark, fix.nodes, fix.edges, model,
      SampleCfg(hops = 2, fanout = -1), batchSize = 30, nClasses = 3)
    val fullGraphWork = fix.local.n.toLong * model.hops
    assert(st.nodeLayerComputations > fullGraphWork,
      s"expected redundancy: ${st.nodeLayerComputations} vs $fullGraphWork")
  }

  test("a single batch covering the graph minimizes redundancy") {
    val (_, big) = TraditionalPipeline.infer(spark, fix.nodes, fix.edges, model,
      SampleCfg(hops = 2, fanout = -1), batchSize = 1000, nClasses = 3)
    val (_, small) = TraditionalPipeline.infer(spark, fix.nodes, fix.edges, model,
      SampleCfg(hops = 2, fanout = -1), batchSize = 20, nClasses = 3)
    assert(big.batches == 1 && small.batches > 1)
    assert(big.nodeLayerComputations <= small.nodeLayerComputations)
  }

  test("sampled inference still returns a logit vector per vertex") {
    val (res, _) = TraditionalPipeline.infer(spark, fix.nodes, fix.edges, model,
      SampleCfg(hops = 2, fanout = 2, seed = Some(3L)), batchSize = 60, nClasses = 3)
    assert(res.size == fix.local.n)
    res.values.foreach(h => assert(h.length == 3))
  }

  test("OOM budget propagates out of the pipeline") {
    intercept[OomSimulated] {
      TraditionalPipeline.infer(spark, fix.nodes, fix.edges, model,
        SampleCfg(hops = 2, fanout = -1, maxGatherRows = 10), batchSize = 60, nClasses = 3)
    }
  }

  test("stats wall-clock fields are populated") {
    val (_, st) = TraditionalPipeline.infer(spark, fix.nodes, fix.edges, model,
      SampleCfg(hops = 1, fanout = -1), batchSize = 60, nClasses = 3)
    assert(st.sampleWallMs >= 0 && st.forwardWallMs >= 0 && st.subgraphNodes > 0)
  }
}
