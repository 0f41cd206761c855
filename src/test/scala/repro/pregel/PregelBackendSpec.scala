package repro.pregel

import repro.{BackendTestUtil, SparkSpec}
import repro.BackendTestUtil.{assertMatchesLocal, fixture}
import repro.core.Models
import repro.graphgen.GraphSpec
import repro.pregel.PregelBackend.PregelOpts

class PregelBackendSpec extends SparkSpec {

  private lazy val fix = fixture(spark, GraphSpec(nNodes = 200, avgOutDeg = 4, featDim = 6,
    nClasses = 3, homophily = 0.3, seed = 55L, wMin = 0.5, wMax = 1.5))
  private lazy val sage2 = Models.sage(Seq(6, 4, 3))
  private lazy val gat2 = Models.gat(Seq(6, 4, 3), heads = 2)

  test("SAGE 2-layer: native Pregel matches the local reference") {
    assertMatchesLocal(
      PregelBackend.run(spark, fix.nodes, fix.edges, sage2, PregelOpts(useNativePregel = true)),
      fix.local, fix.reference(sage2))
  }

  test("SAGE 2-layer: aggregateMessages loop matches the local reference") {
    assertMatchesLocal(
      PregelBackend.run(spark, fix.nodes, fix.edges, sage2, PregelOpts(useNativePregel = false)),
      fix.local, fix.reference(sage2))
  }

  test("GAT 2-layer: native Pregel matches (union aggregation, attention in apply_node)") {
    assertMatchesLocal(
      PregelBackend.run(spark, fix.nodes, fix.edges, gat2, PregelOpts(useNativePregel = true)),
      fix.local, fix.reference(gat2), tol = 1e-7)
  }

  test("GAT 2-layer: loop mode matches") {
    assertMatchesLocal(
      PregelBackend.run(spark, fix.nodes, fix.edges, gat2, PregelOpts(useNativePregel = false)),
      fix.local, fix.reference(gat2), tol = 1e-7)
  }

  test("partial-gather off (messages travel unioned) is exact for SAGE") {
    assertMatchesLocal(
      PregelBackend.run(spark, fix.nodes, fix.edges, sage2,
        PregelOpts(useNativePregel = false, partialGather = false)),
      fix.local, fix.reference(sage2))
    assertMatchesLocal(
      PregelBackend.run(spark, fix.nodes, fix.edges, sage2,
        PregelOpts(useNativePregel = true, partialGather = false)),
      fix.local, fix.reference(sage2))
  }

  test("precomputePayload off recomputes per-edge with identical results") {
    assertMatchesLocal(
      PregelBackend.run(spark, fix.nodes, fix.edges, gat2,
        PregelOpts(useNativePregel = false, precomputePayload = false)),
      fix.local, fix.reference(gat2), tol = 1e-7)
  }

  test("native and loop modes agree bit-for-bit on argmax predictions") {
    val a = BackendTestUtil.collectH(
      PregelBackend.run(spark, fix.nodes, fix.edges, sage2, PregelOpts(useNativePregel = true)))
    val b = BackendTestUtil.collectH(
      PregelBackend.run(spark, fix.nodes, fix.edges, sage2, PregelOpts(useNativePregel = false)))
    a.foreach { case (id, h) =>
      val diff = h.zip(b(id)).map { case (x, y) => math.abs(x - y) }.max
      assert(diff < 1e-9, s"vertex $id differs by $diff")
    }
  }

  test("1-layer and 3-layer model depths both work") {
    val m1 = Models.sage(Seq(6, 3))
    val m3 = Models.sage(Seq(6, 5, 4, 3))
    assertMatchesLocal(PregelBackend.run(spark, fix.nodes, fix.edges, m1),
      fix.local, fix.reference(m1))
    assertMatchesLocal(PregelBackend.run(spark, fix.nodes, fix.edges, m3),
      fix.local, fix.reference(m3))
  }

  test("zero-in-degree vertices advance every superstep (the marker-edge fix)") {
    import spark.implicits._
    // star: 0 -> 1..4; vertices 0..4, vertex 0 never receives messages
    val nodes = (0L to 4L).map(i => (i, Seq.tabulate(3)(j => (i + j + 1).toDouble), 0, Seq(0)))
      .toDF("id", "feat", "label", "labels")
    val edges = (1L to 4L).map(d => (0L, d, 1.0)).toDF("src", "dst", "w")
    val m = Models.sage(Seq(3, 3, 2))
    val local = repro.graphgen.GraphGen.toLocal(nodes, edges, 2)
    val ref = repro.core.LocalInference.forward(local, m)
    assertMatchesLocal(PregelBackend.run(spark, nodes, edges, m, PregelOpts(useNativePregel = true)),
      local, ref)
    assertMatchesLocal(PregelBackend.run(spark, nodes, edges, m, PregelOpts(useNativePregel = false)),
      local, ref)
  }

  test("power-law in-degree graph (hub receivers) stays exact") {
    val fz = fixture(spark, repro.graphgen.GraphGen.powerLaw(500, avgDeg = 6, inSkew = true, seed = 66L))
    val m = Models.sage(Seq(16, 8, 4))
    assertMatchesLocal(PregelBackend.run(spark, fz.nodes, fz.edges, m), fz.local, fz.reference(m), tol = 1e-7)
  }
}
