package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.nn.DMat

object TinyGraphs {
  /** 3 vertices; edges 0→2 (w=1), 1→2 (w=1), 2→0 (w=2). */
  def triangle(featDim: Int = 2): LocalGraph = {
    val x = new DMat(3, featDim, Array.tabulate(3 * featDim)(i => (i + 1).toDouble))
    LocalGraph(3, Array(0L, 1L, 2L), Array(0, 1, 2), Array(2, 2, 0), Array(1.0, 1.0, 2.0),
      x, DMat.zeros(3, 2), Array(0, 1, 0))
  }

  /** Random graph with a given edge count; vertex 0 has no in-edges. */
  def random(n: Int, e: Int, featDim: Int, seed: Long): LocalGraph = {
    val rng = new java.util.Random(seed)
    val src = Array.fill(e)(rng.nextInt(n))
    val dst = Array.fill(e)(1 + rng.nextInt(n - 1)) // keep vertex 0 in-degree 0
    val w = Array.fill(e)(0.5 + rng.nextDouble())
    LocalGraph(n, Array.tabulate(n)(_.toLong), src, dst, w,
      DMat.randn(n, featDim, 1.0, seed + 1), DMat.zeros(n, 2), Array.fill(n)(0))
  }
}

class LocalInferenceSpec extends AnyFunSuite {

  test("identity SAGE layer on the triangle graph — hand computed") {
    val g = TinyGraphs.triangle()
    val l = SageLayer(DMat.eye(2), DMat.eye(2), DMat.zeros(1, 2), Act.Id)
    val out = LocalInference.forward(g, GnnModel(Seq(l)))
    // h0=(1,2), h1=(3,4), h2=(5,6)
    // v0: in from 2, w=2 → mean=(5,6); out=(6,8)
    // v1: no in-edges → (3,4)
    // v2: in from 0 and 1, w=1,1 → mean=(2,3); out=(7,9)
    assert(out.row(0).toSeq == Seq(6.0, 8.0))
    assert(out.row(1).toSeq == Seq(3.0, 4.0))
    assert(out.row(2).toSeq == Seq(7.0, 9.0))
  }

  test("two stacked identity SAGE layers — hand computed second round") {
    val g = TinyGraphs.triangle()
    val l = SageLayer(DMat.eye(2), DMat.eye(2), DMat.zeros(1, 2), Act.Id)
    val out = LocalInference.forward(g, GnnModel(Seq(l, l)))
    // after layer1: h0=(6,8), h1=(3,4), h2=(7,9)
    // v0: mean=(7,9) → (13,17); v1: (3,4); v2: mean=((6,8)+(3,4))/2=(4.5,6) → (11.5,15)
    assert(out.row(0).toSeq == Seq(13.0, 17.0))
    assert(out.row(1).toSeq == Seq(3.0, 4.0))
    assert(out.row(2).toSeq == Seq(11.5, 15.0))
  }

  test("forward output dims follow the model") {
    val g = TinyGraphs.random(20, 60, 8, 5)
    val m = Models.sage(Seq(8, 6, 3))
    val out = LocalInference.forward(g, m)
    assert(out.rows == 20 && out.cols == 3)
  }

  test("zero-in-degree vertex still advances through all layers") {
    val g = TinyGraphs.random(10, 30, 4, 6)
    val m = Models.sage(Seq(4, 4, 4))
    val out = LocalInference.forward(g, m)
    // vertex 0 has no in-edges: its value is act(bias + h·Wself) applied twice
    val l0 = m.layers(0); val l1 = m.layers(1)
    val expect = l1.applyNode(l0.applyNode(g.x.row(0), EmptyAgg), EmptyAgg)
    assert(out.row(0).zip(expect).forall { case (a, e) => math.abs(a - e) < 1e-12 })
  }

  test("GAT forward runs and is order-independent in edge layout") {
    val g = TinyGraphs.random(15, 50, 6, 7)
    val m = Models.gat(Seq(6, 4, 3), heads = 2)
    val out1 = LocalInference.forward(g, m)
    // shuffle the edge arrays: results must be identical (multiset semantics)
    val perm = scala.util.Random.shuffle((0 until g.nEdges).toList).toArray
    val g2 = g.copy(src = perm.map(g.src), dst = perm.map(g.dst), w = perm.map(g.w))
    val out2 = LocalInference.forward(g2, m)
    assert(out1.maxAbsDiff(out2) < 1e-9)
  }

  test("inDegree / outDegree / inEdgesOf bookkeeping") {
    val g = TinyGraphs.triangle()
    assert(g.inDegree.toSeq == Seq(1, 0, 2))
    assert(g.outDegree.toSeq == Seq(1, 1, 1))
    assert(g.inEdgesOf(2).toSeq.map(g.src) == Seq(0, 1))
  }

  test("weighted SAGE differs from unweighted when weights differ") {
    val g = TinyGraphs.triangle()
    val gUnit = g.copy(w = Array(1.0, 1.0, 1.0))
    val m = Models.sage(Seq(2, 2))
    val a = LocalInference.forward(g, m)
    val b = LocalInference.forward(gUnit, m)
    // vertex 2's inputs have equal weights in both graphs; vertex 0's differ
    // only by scale w=2 vs 1 — weighted mean of a single message is the same!
    assert(a.maxAbsDiff(b) < 1e-12)
    // but with two in-edges of different weight the mean changes:
    val g3 = g.copy(w = Array(3.0, 1.0, 2.0))
    val c = LocalInference.forward(g3, m)
    assert(c.row(2).zip(b.row(2)).exists { case (x, y) => math.abs(x - y) > 1e-9 })
  }

  test("model dim mismatch is rejected at construction") {
    intercept[IllegalArgumentException](GnnModel(Seq(
      SageLayer(DMat.eye(2), DMat.eye(2), DMat.zeros(1, 2), Act.Id),
      SageLayer(DMat.eye(3), DMat.eye(3), DMat.zeros(1, 3), Act.Id))))
  }

  test("predict and predictMulti heads") {
    val m = Models.sage(Seq(2, 3))
    assert(m.predict(Array(0.1, 0.9, 0.3)) == 1)
    assert(GnnModel(m.layers, multiLabel = true)
      .predictMulti(Array(-1.0, 0.5, 0.0)).toSeq == Seq(false, true, false))
  }
}
