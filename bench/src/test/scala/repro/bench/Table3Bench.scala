package repro.bench

import repro.SparkSpec
import repro.harness.Table3Harness
import repro.harness.Table3Harness.Config

/** Table III — wall time and resource cost of the four inference pipelines.
  *
  * Shape assertions (the paper's qualitative result): both InferTurbo
  * backends beat both traditional pipelines in wall time, and the
  * traditional pipelines burn more resources.
  */
class Table3Bench extends SparkSpec {

  test("Table III: measure PyG-sim / DGL-sim / On-MR / On-Pregel") {
    val report = Table3Harness.run(spark, Config(magScale = 0.5))
    println("\n" + report + "\n")
    // parse our own measured rows back out for the shape assertions
    val timeRows = report.linesIterator.filter(_.contains("ours (s)")).toSeq
    assert(timeRows.size == 2, "expected a measured time row per algorithm")
    timeRows.foreach { row =>
      val nums = row.split("\\|").map(_.trim).filter(_.nonEmpty).takeRight(4).map(_.toDouble)
      val Array(pyg, dgl, mr, pregel) = nums
      assert(math.min(mr, pregel) < pyg,
        s"InferTurbo should beat the PyG-sim pipeline: $row")
      assert(math.min(mr, pregel) < dgl,
        s"InferTurbo should beat the DGL-sim pipeline: $row")
    }
  }
}
