package repro.harness

import org.apache.spark.sql.SparkSession
import repro.batch.BatchBackend
import repro.batch.BatchBackend.BatchOpts
import repro.core.Models
import repro.graphgen.GraphGen
import repro.khop.{SampleCfg, TraditionalPipeline}
import repro.metrics.SparkCost
import repro.pregel.PregelBackend

/** Table III — inference time and resource cost of the four pipelines on the
  * MAG stand-in. PyG-sim/DGL-sim are the traditional k-hop pipelines (high
  * fanout, 2 hops); On-MR is the batch backend with per-round parquet spill;
  * On-Pregel is the GraphX backend. Resource = executor task time + driver
  * forward time (the paper's cpu·min analog).
  */
object Table3Harness {

  final case class Config(
      magScale: Double = 0.5,
      fanoutHi: Int = 30,
      batchSize: Int = 2000,
      hidden: Int = 32,
      out: Int = 16)

  final case class Measured(timeS: Double, cpuS: Double)

  final case class PaperRow(timeMin: Double, cpuMin: Double)
  /** Paper Table III (MAG240M, minutes and cpu·min). */
  val paper: Map[(String, String), PaperRow] = Map(
    ("SAGE", "PyG") -> PaperRow(780, 1.6e6), ("SAGE", "DGL") -> PaperRow(630, 1.3e6),
    ("SAGE", "On-MR") -> PaperRow(20, 2.6e4), ("SAGE", "On-Pregel") -> PaperRow(15, 2.9e4),
    ("GAT", "PyG") -> PaperRow(1056, 2.1e6), ("GAT", "DGL") -> PaperRow(948, 1.9e6),
    ("GAT", "On-MR") -> PaperRow(34, 4.4e4), ("GAT", "On-Pregel") -> PaperRow(21, 4.1e4),
  )

  def run(spark: SparkSession, cfg: Config = Config()): String = {
    val spec = GraphGen.magLite(cfg.magScale)
    val nodes = GraphGen.nodes(spark, spec).cache()
    val edges = GraphGen.edges(spark, spec).cache()
    nodes.count(); edges.count()
    val spill = java.nio.file.Files.createTempDirectory("inferturbo-mr").toString

    // warmup: pay JIT/codegen/parquet/GraphX init once, outside the clocks
    BatchBackend.run(spark, nodes, edges, Models.sage(Seq(spec.featDim, 8)),
      BatchOpts(spillDir = Some(s"$spill/warmup"))).count()
    PregelBackend.run(spark, nodes, edges, Models.sage(Seq(spec.featDim, 8))).count()

    val results = for (algo <- Seq("SAGE", "GAT")) yield {
      val dims = Seq(spec.featDim, cfg.hidden, cfg.out)
      val model = if (algo == "SAGE") Models.sage(dims) else Models.gat(dims, heads = 2)

      def traditional(tag: String, dedup: Boolean): Measured = {
        val ((_, st), c) = SparkCost.measure(spark, s"t3-$algo-$tag") {
          TraditionalPipeline.infer(spark, nodes, edges, model,
            SampleCfg(hops = model.hops, fanout = cfg.fanoutHi, dedupFrontier = dedup,
              seed = Some(7L)),
            cfg.batchSize, spec.nClasses)
        }
        Measured(c.wallMs / 1000.0, c.withDriver(st.forwardWallMs).cpuSec)
      }

      val pyg = traditional("pyg", dedup = false)
      val dgl = traditional("dgl", dedup = true)
      val (_, mrC) = SparkCost.measure(spark, s"t3-$algo-mr") {
        BatchBackend.run(spark, nodes, edges, model,
          BatchOpts(spillDir = Some(s"$spill/$algo"))).count()
      }
      val (_, pregelC) = SparkCost.measure(spark, s"t3-$algo-pregel") {
        PregelBackend.run(spark, nodes, edges, model).count()
      }
      algo -> Map(
        "PyG" -> pyg, "DGL" -> dgl,
        "On-MR" -> Measured(mrC.wallMs / 1000.0, mrC.cpuSec),
        "On-Pregel" -> Measured(pregelC.wallMs / 1000.0, pregelC.cpuSec))
    }

    val systems = Seq("PyG", "DGL", "On-MR", "On-Pregel")
    val rows = results.flatMap { case (algo, m) =>
      Seq(
        Seq(s"Time $algo", "paper (min)") ++ systems.map(s => TableFmt.num(paper((algo, s)).timeMin)),
        Seq(s"Time $algo", "ours (s)") ++ systems.map(s => f"${m(s).timeS}%.1f"),
        Seq(s"Resource $algo", "paper (cpu*min)") ++ systems.map(s => TableFmt.num(paper((algo, s)).cpuMin)),
        Seq(s"Resource $algo", "ours (cpu*s)") ++ systems.map(s => f"${m(s).cpuS}%.1f"),
      )
    }
    val speedups = results.map { case (algo, m) =>
      val sp = m("PyG").timeS / math.min(m("On-MR").timeS, m("On-Pregel").timeS)
      f"$algo: best-ours vs PyG-sim speedup = $sp%.1fx (paper: 30x-50x)"
    }
    s"Table III - time and resource on different systems (MAG-lite, scale=${cfg.magScale})\n" +
      TableFmt.format(Seq("metric", "unit") ++ systems, rows) + "\n" + speedups.mkString("\n")
  }
}
