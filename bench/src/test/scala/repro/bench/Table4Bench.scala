package repro.bench

import repro.SparkSpec
import repro.harness.Table4Harness
import repro.harness.Table4Harness.Config

/** Table IV — cost vs hops.
  *
  * Shape assertions: our full-graph cost grows ~linearly in hops (3-hop
  * under ~6x the 1-hop cost); the high-fanout traditional pipeline blows up
  * and hits the (simulated) OOM at 3 hops, as in the paper.
  */
class Table4Bench extends SparkSpec {

  test("Table IV: hops sweep for nbr-lo / nbr-hi / ours") {
    val report = Table4Harness.run(spark, Config(magScale = 0.5))
    println("\n" + report + "\n")
    assert(report.contains("OOM"), "nbr-hi at 3 hops should hit the simulated OOM")
    // ours must complete all three depths
    val oursTime = report.linesIterator
      .filter(l => l.contains("ours(On-MR)") && l.contains("time ours"))
      .toSeq.head
    val nums = oursTime.split("\\|").map(_.trim).filter(_.nonEmpty).takeRight(3).map(_.toDouble)
    assert(nums.forall(_ > 0))
    // near-linear growth: hop3 cost well under quadratic blowup
    assert(nums(2) < nums(0) * 8, s"ours not ~linear in hops: ${nums.toSeq}")
    // the OOM cell must be in the nbr-hi row
    val hiRow = report.linesIterator.filter(l => l.contains("nbr-hi") && l.contains("time ours")).toSeq.head
    assert(hiRow.contains("OOM"))
  }
}
