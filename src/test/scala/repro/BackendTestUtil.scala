package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{GnnModel, LocalGraph, LocalInference}
import repro.graphgen.{GraphGen, GraphSpec}
import repro.nn.DMat

/** Shared fixture: a generated graph, its local materialization, and the
  * single-machine reference forward that every distributed backend must
  * reproduce.
  */
final case class GraphFixture(nodes: DataFrame, edges: DataFrame, local: LocalGraph) {
  def reference(model: GnnModel): DMat = LocalInference.forward(local, model)
}

object BackendTestUtil {

  def fixture(spark: SparkSession, spec: GraphSpec): GraphFixture = {
    val nodes = GraphGen.nodes(spark, spec).cache()
    val edges = GraphGen.edges(spark, spec).cache()
    GraphFixture(nodes, edges, GraphGen.toLocal(nodes, edges, spec.nClasses))
  }

  def collectH(df: DataFrame): Map[Long, Array[Double]] =
    df.collect().map(r => r.getLong(0) -> r.getSeq[Double](1).toArray).toMap

  /** Assert a backend's (id, h) output matches the local reference. */
  def assertMatchesLocal(df: DataFrame, g: LocalGraph, ref: DMat, tol: Double = 1e-8): Unit = {
    val got = collectH(df)
    assert(got.size == g.n, s"row count ${got.size} != ${g.n}")
    var worst = 0.0
    (0 until g.n).foreach { i =>
      val hGot = got(g.ids(i))
      val hRef = ref.row(i)
      assert(hGot.length == hRef.length, s"dim mismatch at vertex ${g.ids(i)}")
      hGot.zip(hRef).foreach { case (a, b) => worst = math.max(worst, math.abs(a - b)) }
    }
    assert(worst < tol, s"max abs diff $worst exceeds $tol")
  }
}
