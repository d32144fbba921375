package repro.bench

import org.apache.spark.sql.SparkSession
import repro.gen.BipartiteGen
import repro.spark.GraphFrames

/** Table 1 — dataset statistics, computed over the edge DataFrames with
  * Spark SQL (and cross-checked against DuckDB in the bench suite).
  */
object Tables {

  def datasetTable(spark: SparkSession): Harness.Table = {
    val rows = BipartiteGen.catalog.map { spec =>
      val g = spec.build()
      val summary = GraphFrames.summary(GraphFrames.toEdges(spark, g)).collect()(0)
      Seq(
        spec.name, spec.category,
        s"${spec.paperL}", s"${spec.paperR}", s"${spec.paperE}",
        s"${spec.nL}", s"${spec.nR}", s"${summary.getLong(0)}",
      )
    }
    Harness.Table("t1_datasets", "Table 1: datasets (paper sizes vs scaled stand-ins)",
      Seq("name", "category", "|L| paper", "|R| paper", "|E| paper", "|L| ours", "|R| ours", "|E| ours"),
      rows).emit()
  }
}
