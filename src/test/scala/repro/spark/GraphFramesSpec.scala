package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.gen.BipartiteGen

class GraphFramesSpec extends SparkSpec {

  test("local -> edges -> local round trip") {
    val g = TestGraphs.random(10, 12, 0.3, 10001)
    val df = GraphFrames.toEdges(spark, g)
    val g2 = GraphFrames.toLocal(df, g.nL, g.nR)
    assert(g2.numEdges == g.numEdges)
    for (v <- 0 until g.nL) assert(g2.adjL(v).toSeq == g.adjL(v).toSeq)
  }

  test("leftDegrees matches DuckDB") {
    val g = TestGraphs.random(15, 15, 0.3, 10002)
    val edges = GraphFrames.toEdges(spark, g)
    val degrees = GraphFrames.leftDegrees(edges).select(col("src"), col("degree"))
    Oracle.assertEquivalent(
      degrees,
      "SELECT src, count(*) AS degree FROM edges GROUP BY src",
      "edges" -> edges,
    )
  }

  test("rightDegrees matches DuckDB") {
    val g = TestGraphs.random(15, 15, 0.3, 10003)
    val edges = GraphFrames.toEdges(spark, g)
    Oracle.assertEquivalent(
      GraphFrames.rightDegrees(edges),
      "SELECT dst, count(*) AS degree FROM edges GROUP BY dst",
      "edges" -> edges,
    )
  }

  test("summary matches DuckDB") {
    val g = TestGraphs.random(20, 10, 0.25, 10004)
    val edges = GraphFrames.toEdges(spark, g)
    Oracle.assertEquivalent(
      GraphFrames.summary(edges),
      "SELECT count(*) AS m, count(DISTINCT src) AS active_l, count(DISTINCT dst) AS active_r FROM edges",
      "edges" -> edges,
    )
  }

  test("degrees agree with the local graph") {
    val g = TestGraphs.random(12, 9, 0.4, 10005)
    val edges = GraphFrames.toEdges(spark, g)
    val degMap = GraphFrames.leftDegrees(edges).collect()
      .map(r => r.getLong(0).toInt -> r.getLong(1).toInt).toMap
    for (v <- 0 until g.nL) assert(degMap.getOrElse(v, 0) == g.degL(v))
  }

  test("distributed ER generator matches DuckDB aggregation and edge bounds") {
    val df = BipartiteGen.erEdgesDf(spark, nL = 50, nR = 40, m = 400, seed = 5).cache()
    Oracle.assertEquivalent(
      GraphFrames.summary(df),
      "SELECT count(*) AS m, count(DISTINCT src) AS active_l, count(DISTINCT dst) AS active_r FROM edges",
      "edges" -> df,
    )
    val rows = df.collect()
    assert(rows.length <= 400)
    assert(rows.forall(r => r.getLong(0) >= 0 && r.getLong(0) < 50))
    assert(rows.forall(r => r.getLong(1) >= 0 && r.getLong(1) < 40))
    // dropDuplicates really dropped duplicates
    assert(rows.map(r => (r.getLong(0), r.getLong(1))).distinct.length == rows.length)
  }
}
