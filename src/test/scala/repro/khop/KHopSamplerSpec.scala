package repro.khop

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.graphgen.{GraphGen, GraphSpec}

class KHopSamplerSpec extends SparkSpec {
  import spark.implicits._

  private lazy val spec = GraphSpec(nNodes = 150, avgOutDeg = 4, featDim = 4, nClasses = 3, seed = 91L)
  private lazy val edges = GraphGen.edges(spark, spec).cache()

  test("1-hop full fanout returns exactly the targets' in-edges") {
    val targets = Seq(3L, 7L, 11L).toDF("id")
    val (sub, st) = KHopSampler.subgraphEdges(spark, edges, targets, SampleCfg(hops = 1))
    val expect = edges.filter(col("dst").isin(3L, 7L, 11L))
      .collect().map(r => (r.getLong(0), r.getLong(1))).sorted.toSeq
    val got = sub.collect().map(r => (r.getLong(0), r.getLong(1))).sorted.toSeq
    assert(got == expect)
    assert(st.gatheredRows == expect.size && st.joinRows == expect.size)
  }

  test("2-hop full fanout matches DuckDB recursive expansion (oracle)") {
    val targets = Seq(0L, 5L, 10L, 20L).toDF("id").cache()
    val (sub, _) = KHopSampler.subgraphEdges(spark, edges, targets,
      SampleCfg(hops = 2, dedupFrontier = true))
    Oracle.assertEquivalent(
      sub.select(col("src"), col("dst")).distinct(),
      """SELECT DISTINCT CAST(src AS BIGINT) AS src, CAST(dst AS BIGINT) AS dst FROM (
        |  SELECT e.src, e.dst FROM edges e JOIN targets t ON CAST(e.dst AS BIGINT) = CAST(t.id AS BIGINT)
        |  UNION ALL
        |  SELECT e2.src, e2.dst FROM edges e2 JOIN (
        |    SELECT DISTINCT e.src AS nid FROM edges e JOIN targets t ON CAST(e.dst AS BIGINT) = CAST(t.id AS BIGINT)
        |  ) f ON CAST(e2.dst AS BIGINT) = CAST(f.nid AS BIGINT)
        |) q""".stripMargin,
      "edges" -> edges.select("src", "dst"), "targets" -> targets)
  }

  test("fanout caps in-edges per frontier occurrence") {
    val targets = (0L until 50L).toDF("id")
    val (sub, _) = KHopSampler.subgraphEdges(spark, edges, targets,
      SampleCfg(hops = 1, fanout = 2, seed = Some(1L)))
    val perDst = sub.groupBy("dst").count().collect()
    perDst.foreach(r => assert(r.getLong(1) <= 2, s"dst ${r.getLong(0)} kept ${r.getLong(1)} edges"))
  }

  test("sampled edges are a subset of the original edges") {
    val targets = (0L until 30L).toDF("id")
    val (sub, _) = KHopSampler.subgraphEdges(spark, edges, targets,
      SampleCfg(hops = 2, fanout = 3, seed = Some(2L)))
    val all = edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    sub.collect().foreach(r => assert(all.contains((r.getLong(0), r.getLong(1)))))
  }

  test("multiset frontier (PyG-style) gathers at least as many rows as dedup (DGL-style)") {
    val targets = (0L until 60L).toDF("id")
    val (_, noDedup) = KHopSampler.subgraphEdges(spark, edges, targets,
      SampleCfg(hops = 2, dedupFrontier = false))
    val (_, dedup) = KHopSampler.subgraphEdges(spark, edges, targets,
      SampleCfg(hops = 2, dedupFrontier = true))
    assert(noDedup.joinRows >= dedup.joinRows,
      s"nodedup ${noDedup.joinRows} < dedup ${dedup.joinRows}")
  }

  test("memory budget triggers the simulated OOM") {
    val targets = (0L until 100L).toDF("id")
    val ex = intercept[OomSimulated] {
      KHopSampler.subgraphEdges(spark, edges, targets,
        SampleCfg(hops = 3, maxGatherRows = 50))
    }
    assert(ex.gatheredRows > 50 && ex.budget == 50)
  }

  test("deterministic with a fixed seed") {
    val targets = (0L until 40L).toDF("id")
    def runOnce() = KHopSampler.subgraphEdges(spark, edges, targets,
      SampleCfg(hops = 2, fanout = 2, seed = Some(9L)))._1
      .collect().map(r => (r.getLong(0), r.getLong(1))).sorted.toSeq
    assert(runOnce() == runOnce())
  }

  test("hops must be positive") {
    intercept[IllegalArgumentException] {
      KHopSampler.subgraphEdges(spark, edges, Seq(1L).toDF("id"), SampleCfg(hops = 0))
    }
  }
}
