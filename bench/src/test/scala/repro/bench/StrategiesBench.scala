package repro.bench

import repro.SparkSpec
import repro.harness.StrategiesHarness
import repro.harness.StrategiesHarness.Config

/** Strategy studies (the numbers behind the paper's Figs. 9–13):
  * partial-gather must cut shuffle records on an in-skew graph; shadow-nodes
  * must cap the max out-degree at the threshold.
  */
class StrategiesBench extends SparkSpec {

  test("strategy IO study: partial-gather / broadcast / shadow-nodes") {
    val report = StrategiesHarness.run(spark, Config(nNodes = 20000, avgDeg = 15, numWorkers = 200))
    println("\n" + report + "\n")
    // partial-gather reduction parses as a positive percentage
    val pgLine = report.linesIterator.find(_.contains("shuffle write records")).get
    val reduction = "reduction (-?[0-9.]+)%".r.findFirstMatchIn(pgLine).get.group(1).toDouble
    assert(reduction > 10.0, s"partial-gather should cut shuffle records, got $reduction% :: $pgLine")
    // broadcast removes hub messages from the shuffle entirely
    val bcLine = report.linesIterator.find(_.startsWith("broadcast:")).get
    val bcCuts = "reduction (-?[0-9.]+)%".r.findAllMatchIn(bcLine).map(_.group(1).toDouble).toSeq
    assert(bcCuts.exists(_ > 3.0), s"broadcast should cut shuffle IO: $bcLine")
    val shadowLine = report.linesIterator.find(_.startsWith("shadow-nodes")).get
    val caps = "max out-degree ([0-9]+) -> ([0-9]+) \\(threshold ([0-9]+)\\)".r
      .findFirstMatchIn(shadowLine).get
    assert(caps.group(2).toLong <= caps.group(3).toLong,
      s"shadow-nodes must cap out-degree at the threshold: $shadowLine")
    assert(caps.group(1).toLong > caps.group(2).toLong, s"no hubs were split: $shadowLine")
  }
}
