package repro.bench

import repro.SparkSpec
import repro.harness.Table2Harness
import repro.harness.Table2Harness.Config

/** Table II — prediction performance across inference pipelines.
  *
  * Shape assertions: all three pipelines serve the same trained model, so
  * their metrics must be comparable (the paper's claim); the full-graph
  * pipeline must not be worse than the sampled ones by more than a small
  * margin (sampling drops information, full-graph never does).
  */
class Table2Bench extends SparkSpec {

  test("Table II: train SAGE/GAT per dataset and compare the three pipelines") {
    val cfg = Config(epochs = 15)
    val cells = for {
      algo <- Seq("SAGE", "GAT")
      (ds, spec) <- Seq(
        ("PPI", repro.graphgen.GraphGen.ppiLite(cfg.ppiScale)),
        ("Product", repro.graphgen.GraphGen.productLite(cfg.productScale)),
        ("MAG240M", repro.graphgen.GraphGen.magLite(cfg.magScale)))
    } yield {
      val m = Table2Harness.runOne(spark, algo, ds, spec, cfg)
      val p = Table2Harness.paper((algo, ds))
      println(f"Table2 $algo%-4s $ds%-8s  paper: pyg=${p.pyg}%.3f dgl=${p.dgl}%.3f ours=${p.ours}%.3f" +
        f"   measured: pyg-sim=${m.pyg}%.3f dgl-sim=${m.dgl}%.3f ours=${m.ours}%.3f")
      (algo, ds, m)
    }
    cells.foreach { case (algo, ds, m) =>
      assert(m.ours > 0.3, s"$algo/$ds: model failed to learn (ours=${m.ours})")
      assert(math.abs(m.ours - m.pyg) < 0.15, s"$algo/$ds pipelines not comparable: $m")
      assert(math.abs(m.ours - m.dgl) < 0.15, s"$algo/$ds pipelines not comparable: $m")
      assert(m.ours >= math.min(m.pyg, m.dgl) - 0.05,
        s"$algo/$ds full-graph inference unexpectedly much worse: $m")
    }
  }
}
