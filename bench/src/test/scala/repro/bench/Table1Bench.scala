package repro.bench

import repro.SparkSpec
import repro.graphgen.GraphGen
import repro.harness.Table1Harness

/** Table I — dataset summary bench. Prints paper vs measured counts. */
class Table1Bench extends SparkSpec {

  test("Table I: generate all four stand-in datasets and report their sizes") {
    val report = Table1Harness.run(spark, scale = 1.0)
    println("\n" + report + "\n")
    assert(report.contains("PPI") && report.contains("Power-Law"))
  }

  test("stand-in scale ordering matches the paper (small < medium < large)") {
    val sizes = Table1Harness.datasets(1.0).map(d => GraphGen.nodes(spark, d.spec).count())
    assert(sizes(0) < sizes(1) && sizes(1) < sizes(2), s"sizes $sizes not increasing")
  }
}
