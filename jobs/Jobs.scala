package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Experiments

/** spark-submit entrypoints, one per evaluation table (DESIGN.md §5).
  *
  * Example:
  *   spark-submit --class repro.jobs.RunRuntimeReal target/scala-2.13/repro_2.13-*.jar
  *
  * Budgets are controlled with REPRO_BUDGET_MS (per run, default 6000).
  */
object JobSession {
  def local(): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-jobs")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}

/** T1 — Table 1: dataset statistics (computed via Spark SQL). */
object RunDatasets {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try repro.bench.Tables.datasetTable(spark)
    finally spark.stop()
  }
}

/** E2 — Figure 7: runtime on real-dataset stand-ins. */
object RunRuntimeReal {
  def main(args: Array[String]): Unit = {
    val n = if (args.nonEmpty) args(0).toInt else 1000
    Experiments.runtimeAcrossDatasets(repro.gen.BipartiteGen.catalog.map(_.name), k = 1, n = n)
    Experiments.runtimeVaryK("writer", 1 to 4, n, Seq("bTraversal", "iTraversal"))
    Experiments.runtimeVaryK("dblp", 1 to 4, n, Seq("bTraversal", "iTraversal"))
    Experiments.runtimeVaryN("writer", 2, Seq(10, 100, 1000, 10000), Seq("bTraversal", "iTraversal"))
    Experiments.runtimeVaryN("dblp", 2, Seq(10, 100, 1000, 10000), Seq("bTraversal", "iTraversal"))
  }
}

/** E3 — Figure 8: delay on the small datasets. */
object RunDelay {
  def main(args: Array[String]): Unit = {
    Experiments.delayTable(
      Seq(
        "divorce" -> repro.gen.BipartiteGen.dataset("divorce").build(),
        "cfat-s"  -> repro.gen.BipartiteGen.zipf(40, 40, 160, 1.0, 1.0, seed = 112),
      ),
      1 to 3,
    )
  }
}

/** E4 — Figure 9: synthetic scalability sweeps (the 10^7-vertex / 10^8-edge
  * point needs ~8 GB of heap and a few minutes of generation time).
  */
object RunScalability {
  def main(args: Array[String]): Unit = {
    val big = if (args.contains("--huge")) Seq(10000000) else Nil
    Experiments.scalabilityVertices(Seq(10000, 100000, 1000000) ++ big, density = 10, k = 1, n = 1000)
    Experiments.scalabilityDensity(100000, Seq(2, 5, 10, 20), k = 1, n = 1000)
  }
}

/** E5 — Figure 10: large-MBP enumeration vs theta. */
object RunLargeMbp {
  def main(args: Array[String]): Unit = {
    Experiments.largeMbpTable(Seq("writer", "dblp"), 3 to 7, k = 1)
  }
}

/** E6 — Figure 11: solution-graph links per technique. */
object RunSolutionGraph {
  def main(args: Array[String]): Unit = {
    val divorce = repro.gen.BipartiteGen.dataset("divorce").build()
    val cfatS = repro.gen.BipartiteGen.zipf(40, 40, 160, 1.0, 1.0, seed = 112)
    Experiments.solutionGraphTable(Seq("divorce" -> divorce, "cfat-s" -> cfatS), k = 1)
    Experiments.solutionGraphVaryK("divorce", divorce, 1 to 2)
  }
}

/** E7 — Figure 12: EnumAlmostSat implementations. */
object RunEnumAlmostSat {
  def main(args: Array[String]): Unit = {
    Experiments.enumAlmostSatTable("writer", 1 to 3, count = 1000)
    Experiments.enumAlmostSatTable("dblp", 1 to 3, count = 1000)
  }
}

/** E8 — Figure 13: fraud-detection case study. */
object RunFraud {
  def main(args: Array[String]): Unit = {
    Experiments.fraudTable(thetaL = 4, thetaRs = 3 to 7)
  }
}

/** E9 — distributed iTraversal demonstration. */
object RunDistributed {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Experiments.distributedTable(spark, nVertices = 160, density = 2, k = 1)
    finally spark.stop()
  }
}

/** All experiments in sequence. */
object RunAll {
  def main(args: Array[String]): Unit = {
    RunDatasets.main(args)
    RunRuntimeReal.main(Array("1000"))
    RunDelay.main(args)
    RunScalability.main(args)
    RunLargeMbp.main(args)
    RunSolutionGraph.main(args)
    RunEnumAlmostSat.main(args)
    RunFraud.main(args)
    RunDistributed.main(args)
  }
}
