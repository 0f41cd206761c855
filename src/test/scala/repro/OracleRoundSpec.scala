package repro

import org.apache.spark.sql.functions._
import repro.batch.BatchBackend
import repro.core.{Act, GnnModel, SageLayer}
import repro.graphgen.{GraphGen, GraphSpec}
import repro.nn.DMat

/** End-to-end DuckDB oracle checks: a full GAS round with scalar features is
  * SQL-expressible, so the batch backend's result can be verified against an
  * independent engine — not just against our own reference implementation.
  */
class OracleRoundSpec extends SparkSpec {
  import spark.implicits._

  private lazy val spec = GraphSpec(nNodes = 100, avgOutDeg = 5, featDim = 1, nClasses = 2,
    seed = 97L, wMin = 0.5, wMax = 2.0)
  private lazy val nodesRaw = GraphGen.nodes(spark, spec).cache()
  private lazy val edges = GraphGen.edges(spark, spec).cache()

  // scalar node table for DuckDB: (id, h)
  private lazy val scalarNodes =
    nodesRaw.select(col("id"), element_at(col("feat"), 1).as("h")).cache()

  test("one linear SAGE round (1-D) matches DuckDB exactly") {
    val (a, b, c) = (0.5, 2.0, 0.25)
    val layer = SageLayer(new DMat(1, 1, Array(a)), new DMat(1, 1, Array(b)),
      new DMat(1, 1, Array(c)), Act.Id)
    val out = BatchBackend.run(spark, nodesRaw, edges, GnnModel(Seq(layer)))
      .select(col("id"), round(element_at(col("h"), 1), 6).as("h"))
    Oracle.assertEquivalent(
      out,
      s"""SELECT CAST(n.id AS BIGINT) AS id,
         |       ROUND($a * CAST(n.h AS DOUBLE) + $b * COALESCE(m.mean, 0.0) + $c, 6) AS h
         |FROM nodes n LEFT JOIN (
         |  SELECT e.dst AS dst,
         |         SUM(CAST(e.w AS DOUBLE) * CAST(s.h AS DOUBLE)) / SUM(CAST(e.w AS DOUBLE)) AS mean
         |  FROM edges e JOIN nodes s ON CAST(e.src AS BIGINT) = CAST(s.id AS BIGINT)
         |  GROUP BY e.dst
         |) m ON CAST(n.id AS BIGINT) = CAST(m.dst AS BIGINT)""".stripMargin,
      "nodes" -> scalarNodes, "edges" -> edges)
  }

  test("weighted message sums per destination match DuckDB") {
    val sums = edges.join(scalarNodes, edges("src") === scalarNodes("id"))
      .groupBy(edges("dst")).agg(round(sum(col("w") * col("h")), 6).as("msum"))
    Oracle.assertEquivalent(
      sums,
      """SELECT e.dst AS dst, ROUND(SUM(CAST(e.w AS DOUBLE) * CAST(n.h AS DOUBLE)), 6) AS msum
        |FROM edges e JOIN nodes n ON CAST(e.src AS BIGINT) = CAST(n.id AS BIGINT)
        |GROUP BY e.dst""".stripMargin,
      "nodes" -> scalarNodes, "edges" -> edges)
  }

  test("two stacked linear rounds match DuckDB's nested aggregation") {
    val (a, b) = (1.0, 1.0)
    val layer = SageLayer(new DMat(1, 1, Array(a)), new DMat(1, 1, Array(b)),
      DMat.zeros(1, 1), Act.Id)
    val out = BatchBackend.run(spark, nodesRaw, edges, GnnModel(Seq(layer, layer)))
      .select(col("id"), round(element_at(col("h"), 1), 6).as("h"))
    Oracle.assertEquivalent(
      out,
      """WITH h1 AS (
        |  SELECT CAST(n.id AS BIGINT) AS id,
        |         CAST(n.h AS DOUBLE) + COALESCE(m.mean, 0.0) AS h
        |  FROM nodes n LEFT JOIN (
        |    SELECT e.dst AS dst,
        |           SUM(CAST(e.w AS DOUBLE) * CAST(s.h AS DOUBLE)) / SUM(CAST(e.w AS DOUBLE)) AS mean
        |    FROM edges e JOIN nodes s ON CAST(e.src AS BIGINT) = CAST(s.id AS BIGINT)
        |    GROUP BY e.dst
        |  ) m ON CAST(n.id AS BIGINT) = CAST(m.dst AS BIGINT)
        |)
        |SELECT n.id AS id, ROUND(n.h + COALESCE(m.mean, 0.0), 6) AS h
        |FROM h1 n LEFT JOIN (
        |  SELECT CAST(e.dst AS BIGINT) AS dst,
        |         SUM(CAST(e.w AS DOUBLE) * s.h) / SUM(CAST(e.w AS DOUBLE)) AS mean
        |  FROM edges e JOIN h1 s ON CAST(e.src AS BIGINT) = s.id
        |  GROUP BY CAST(e.dst AS BIGINT)
        |) m ON n.id = m.dst""".stripMargin,
      "nodes" -> scalarNodes, "edges" -> edges)
  }

  test("Pregel backend passes the same 1-D linear oracle") {
    val layer = SageLayer(new DMat(1, 1, Array(1.5)), new DMat(1, 1, Array(-0.5)),
      new DMat(1, 1, Array(0.1)), Act.Id)
    val out = repro.pregel.PregelBackend.run(spark, nodesRaw, edges, GnnModel(Seq(layer)))
      .select(col("id"), round(element_at(col("h"), 1), 6).as("h"))
    Oracle.assertEquivalent(
      out,
      """SELECT CAST(n.id AS BIGINT) AS id,
        |       ROUND(1.5 * CAST(n.h AS DOUBLE) + (-0.5) * COALESCE(m.mean, 0.0) + 0.1, 6) AS h
        |FROM nodes n LEFT JOIN (
        |  SELECT e.dst AS dst,
        |         SUM(CAST(e.w AS DOUBLE) * CAST(s.h AS DOUBLE)) / SUM(CAST(e.w AS DOUBLE)) AS mean
        |  FROM edges e JOIN nodes s ON CAST(e.src AS BIGINT) = CAST(s.id AS BIGINT)
        |  GROUP BY e.dst
        |) m ON CAST(n.id AS BIGINT) = CAST(m.dst AS BIGINT)""".stripMargin,
      "nodes" -> scalarNodes, "edges" -> edges)
  }
}
