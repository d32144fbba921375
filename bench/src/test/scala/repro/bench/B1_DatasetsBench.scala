package repro.bench

import repro.{Oracle, SparkSpec}
import repro.gen.BipartiteGen
import repro.spark.GraphFrames

/** T1 — Table 1: dataset statistics of the scaled stand-ins. */
class B1_DatasetsBench extends SparkSpec {

  test("Table 1: dataset statistics (Spark SQL, DuckDB-checked on the small ones)") {
    val table = Tables.datasetTable(spark)
    assert(table.rows.size == 10)
    // Edge counts are within 10% of the catalog target for every dataset.
    table.rows.foreach { row =>
      val name = row(0)
      val target = BipartiteGen.dataset(name).m
      val got = row.last.toLong
      assert(got >= target * 9 / 10, s"$name: $got of $target edges")
    }
    // DuckDB cross-check of the Spark SQL summary on a small dataset.
    val g = BipartiteGen.dataset("crime").build()
    val edges = GraphFrames.toEdges(spark, g)
    Oracle.assertEquivalent(
      GraphFrames.summary(edges),
      "SELECT count(*) AS m, count(DISTINCT src) AS active_l, count(DISTINCT dst) AS active_r FROM edges",
      "edges" -> edges,
    )
  }
}
