package repro.harness

import org.apache.spark.sql.SparkSession
import repro.batch.BatchBackend
import repro.batch.BatchBackend.BatchOpts
import repro.core.Models
import repro.graphgen.GraphGen
import repro.khop.{OomSimulated, SampleCfg, TraditionalPipeline}
import repro.metrics.SparkCost

/** Table IV — time and resource vs number of hops (GNN layers).
  *
  * Roles, scaled to the stand-in graph (avg degree ~10):
  *  - `nbr-lo` plays the paper's nbr50 (real sampling: fanout 5)
  *  - `nbr-hi` plays nbr10000 (fanout 50 ≈ no cap → neighborhood explosion;
  *    exceeds the memory budget at 3 hops → simulated OOM, as in the paper)
  *  - `ours` is the full-graph MR backend: cost grows linearly with hops.
  */
object Table4Harness {

  final case class Config(
      magScale: Double = 0.5,
      fanoutLo: Int = 5,
      fanoutHi: Int = 50,
      batchSize: Int = 2000,
      oomBudget: Long = 500000L)

  /** Paper Table IV: (time min, cpu·min) per (variant, hops); None = OOM/DNF. */
  val paper: Map[(String, Int), Option[(Double, Double)]] = Map(
    ("nbr50", 1) -> Some((23, 4.5e4)), ("nbr50", 2) -> Some((160, 3.2e5)), ("nbr50", 3) -> Some((3300, 6.7e6)),
    ("nbr10000", 1) -> Some((181, 3.6e5)), ("nbr10000", 2) -> Some((780, 1.6e6)), ("nbr10000", 3) -> None,
    ("ours", 1) -> Some((13, 1.7e4)), ("ours", 2) -> Some((20, 2.6e4)), ("ours", 3) -> Some((31, 4.0e4)),
  )

  sealed trait Outcome
  final case class Done(timeS: Double, cpuS: Double) extends Outcome
  case object Oom extends Outcome

  def dimsFor(featDim: Int, hops: Int): Seq[Int] =
    featDim +: Seq.fill(hops - 1)(32) :+ 16

  def run(spark: SparkSession, cfg: Config = Config()): String = {
    val spec = GraphGen.magLite(cfg.magScale)
    val nodes = GraphGen.nodes(spark, spec).cache()
    val edges = GraphGen.edges(spark, spec).cache()
    nodes.count(); edges.count()
    val spill = java.nio.file.Files.createTempDirectory("inferturbo-t4").toString

    // warmup: pay JIT/codegen/parquet/window init once, outside the clocks
    BatchBackend.run(spark, nodes, edges, Models.sage(Seq(spec.featDim, 8)),
      BatchOpts(spillDir = Some(s"$spill/warmup"))).count()
    TraditionalPipeline.infer(spark, nodes, edges, Models.sage(dimsFor(spec.featDim, 1)),
      SampleCfg(hops = 1, fanout = cfg.fanoutLo, dedupFrontier = false, seed = Some(1L)),
      cfg.batchSize * 10, spec.nClasses)

    def traditional(tag: String, fanout: Int, hops: Int): Outcome = {
      val model = Models.sage(dimsFor(spec.featDim, hops))
      try {
        val ((_, st), c) = SparkCost.measure(spark, s"t4-$tag-$hops") {
          TraditionalPipeline.infer(spark, nodes, edges, model,
            SampleCfg(hops = hops, fanout = fanout, dedupFrontier = false, seed = Some(11L),
              maxGatherRows = cfg.oomBudget),
            cfg.batchSize, spec.nClasses)
        }
        Done(c.wallMs / 1000.0, c.withDriver(st.forwardWallMs).cpuSec)
      } catch {
        case OomSimulated(_, _) => Oom
      }
    }

    def ours(hops: Int): Outcome = {
      val model = Models.sage(dimsFor(spec.featDim, hops))
      val (_, c) = SparkCost.measure(spark, s"t4-ours-$hops") {
        BatchBackend.run(spark, nodes, edges, model,
          BatchOpts(spillDir = Some(s"$spill/h$hops"))).count()
      }
      Done(c.wallMs / 1000.0, c.cpuSec)
    }

    val variants = Seq(
      ("nbr50", "nbr-lo(f=5)", (h: Int) => traditional("lo", cfg.fanoutLo, h)),
      ("nbr10000", "nbr-hi(f=50)", (h: Int) => traditional("hi", cfg.fanoutHi, h)),
      ("ours", "ours(On-MR)", (h: Int) => ours(h)),
    )
    val measured = variants.map { case (pKey, label, f) =>
      (pKey, label, (1 to 3).map(h => f(h)))
    }

    def paperCell(pKey: String, h: Int, time: Boolean): String = paper((pKey, h)) match {
      case Some((t, c)) => TableFmt.num(if (time) t else c) + (if (pKey == "nbr50" && h == 3 && time) "+" else "")
      case None         => "OOM"
    }
    def ourCell(o: Outcome, time: Boolean): String = o match {
      case Done(t, c) => f"${if (time) t else c}%.1f"
      case Oom        => "OOM"
    }

    val rows = measured.flatMap { case (pKey, label, res) =>
      Seq(
        Seq(label, "time paper (min)") ++ (1 to 3).map(h => paperCell(pKey, h, time = true)),
        Seq(label, "time ours (s)") ++ res.map(ourCell(_, time = true)),
        Seq(label, "rsrc paper (cpu*min)") ++ (1 to 3).map(h => paperCell(pKey, h, time = false)),
        Seq(label, "rsrc ours (cpu*s)") ++ res.map(ourCell(_, time = false)),
      )
    }
    s"Table IV - time and resource vs hops (MAG-lite, scale=${cfg.magScale})\n" +
      TableFmt.format(Seq("variant", "metric", "hops=1", "hops=2", "hops=3"), rows)
  }
}
