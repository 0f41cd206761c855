package repro.harness

import org.apache.spark.sql.SparkSession
import repro.graphgen.{GraphGen, GraphSpec}

/** Table I — dataset summary. Generates the four stand-in datasets and
  * reports measured #node/#edge/#feature/#class next to the paper's.
  */
object Table1Harness {

  final case class DatasetRow(name: String, spec: GraphSpec,
                              paperNodes: String, paperEdges: String,
                              paperFeat: Int, paperClass: Int)

  def datasets(scale: Double): Seq[DatasetRow] = Seq(
    DatasetRow("PPI", GraphGen.ppiLite(scale), "56,944", "818,716", 50, 121),
    DatasetRow("Product", GraphGen.productLite(scale), "2,449,029", "61,859,140", 100, 47),
    DatasetRow("MAG240M", GraphGen.magLite(scale), "1.2e8", "2.6e9", 768, 153),
    DatasetRow("Power-Law", GraphGen.powerLaw(nNodes = (20000 * scale).toLong.max(64), inSkew = true),
      "1e10", "1e11", 200, 2),
  )

  def run(spark: SparkSession, scale: Double = 1.0): String = {
    val rows = datasets(scale).map { d =>
      val n = GraphGen.nodes(spark, d.spec).count()
      val e = GraphGen.edges(spark, d.spec).count()
      Seq(d.name,
        d.paperNodes, n.toString,
        d.paperEdges, e.toString,
        d.paperFeat.toString, d.spec.featDim.toString,
        d.paperClass.toString, d.spec.nClasses.toString)
    }
    "Table I - datasets (paper vs synthetic stand-ins)\n" +
      TableFmt.format(
        Seq("dataset", "#node(paper)", "#node(ours)", "#edge(paper)", "#edge(ours)",
          "#feat(paper)", "#feat(ours)", "#class(paper)", "#class(ours)"),
        rows)
  }
}
