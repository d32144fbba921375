package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.graph.{BipartiteGraph, VertexSets}
import scala.collection.mutable

/** Distributed iTraversal: reverse-search DFS parallelised over the root
  * level of the solution graph.
  *
  * The driver computes the initial solution H0 = (L0, R_all) and the list
  * of root seeds (left vertices outside L0, in the order the sequential
  * algorithm would process them) together with the exclusion-set snapshot
  * each seed would have observed. Each seed becomes one task in an RDD;
  * executors run the *same* engine ([[ReverseSearch]]) on the broadcast
  * graph, restricted to their seed's root subtree. Subtrees can overlap
  * (tasks keep only a local visited set), so solutions are deduplicated
  * globally with a DataFrame `distinct` — correctness is preserved because
  * reachability, not the visited set, defines the solution set.
  *
  * This is the "parallel and distributed implementation" the paper's
  * conclusion calls for and the reproduction hint asks for (RDD-based
  * traversal with pruning over partitions of the root level).
  */
object DistITraversal {

  /** Enumerate all MBPs distributedly; returns a DataFrame with columns
    * (left: array<int>, right: array<int>), globally deduplicated.
    *
    * `maxPerTask` bounds the number of solutions any one task reports
    * (0 = unbounded) — the distributed analogue of "first N MBPs".
    */
  def enumerate(
      spark: SparkSession,
      g: BipartiteGraph,
      k: Int,
      eas: EnumAlmostSat.Variant = EnumAlmostSat.L20R20,
      maxPerTask: Int = 0,
      parallelism: Int = 0,
  ): DataFrame = {
    import spark.implicits._
    val cfg = TraversalConfig.iTraversal.copy(eas = eas)
    val h0 = Biplex.initialLeftAnchored(g, k)

    // Root seeds in sequential order, each with its exclusion snapshot.
    val seeds = (0 until g.nL).filter(v => !VertexSets.contains(h0.left, v)).toArray
    val tasks = seeds.zipWithIndex.map { case (v, i) => (v, seeds.take(i)) }

    val bcG = spark.sparkContext.broadcast(g)
    val slices = if (parallelism > 0) parallelism else spark.sparkContext.defaultParallelism
    val found = spark.sparkContext
      .parallelize(tasks.toIndexedSeq, math.max(1, math.min(slices, math.max(1, tasks.length))))
      .flatMap { case (seed, exclusion) =>
        val graph = bcG.value
        val out = mutable.ArrayBuffer.empty[(Seq[Int], Seq[Int])]
        var n = 0
        ReverseSearch.run(
          graph, k, cfg,
          sink = { s =>
            out += ((s.left.toSeq, s.right.toSeq))
            n += 1
            maxPerTask <= 0 || n < maxPerTask
          },
          rootRestrict = Some(ReverseSearch.RootRestrict(Array(seed), exclusion, emitRoot = false)),
        )
        out
      }
    val df = found.toDF("left", "right")
    val root = Seq((h0.left.toSeq, h0.right.toSeq)).toDF("left", "right")
    df.union(root).distinct()
  }

  /** Collect the distributed result as a solution set (tests). */
  def collectSolutions(
      spark: SparkSession,
      g: BipartiteGraph,
      k: Int,
      eas: EnumAlmostSat.Variant = EnumAlmostSat.L20R20,
  ): Set[Solution] =
    enumerate(spark, g, k, eas)
      .collect()
      .map { r =>
        Solution.of(r.getSeq[Int](0), r.getSeq[Int](1))
      }
      .toSet
}
