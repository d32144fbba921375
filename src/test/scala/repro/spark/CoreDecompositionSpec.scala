package repro.spark

import repro.{Oracle, SparkSpec, TestGraphs}
import repro.core.CoreReduction

class CoreDecompositionSpec extends SparkSpec {

  for ((alpha, beta) <- Seq((1, 1), (2, 2), (2, 3), (3, 1))) {
    test(s"DataFrame peeling matches the local reference (alpha=$alpha, beta=$beta)") {
      for ((g, seed) <- TestGraphs.smallBatch(8, maxSide = 8, seed = 11000 + alpha * 10 + beta)) {
        val edges = GraphFrames.toEdges(spark, g)
        val (ls, rs) = CoreDecomposition.alphaBetaCoreVertices(edges, alpha, beta)
        val (els, ers) = CoreReduction.alphaBetaCore(g, alpha, beta)
        // The DataFrame version reports vertices with surviving edges; for
        // alpha,beta >= 1 that is exactly the core.
        assert(ls.toSeq == els.toSeq, s"seed $seed left mismatch")
        assert(rs.toSeq == ers.toSeq, s"seed $seed right mismatch")
      }
    }
  }

  test("core edges are a subset of the input edges, validated via DuckDB") {
    val g = TestGraphs.random(12, 12, 0.35, 11100)
    val edges = GraphFrames.toEdges(spark, g).cache()
    val core = CoreDecomposition.alphaBetaCoreEdges(edges, 2, 2)
    // Anti-join must be empty: every core edge exists in the input.
    Oracle.assertEquivalent(
      core.join(edges, Seq("src", "dst"), "left_anti"),
      "SELECT src, dst FROM edges WHERE 1=0",
      "edges" -> edges,
    )
  }

  test("fixpoint: running the peeling twice changes nothing") {
    val g = TestGraphs.random(14, 14, 0.3, 11200)
    val edges = GraphFrames.toEdges(spark, g)
    val once = CoreDecomposition.alphaBetaCoreEdges(edges, 2, 2)
    val twice = CoreDecomposition.alphaBetaCoreEdges(once, 2, 2)
    assert(once.count() == twice.count())
  }

  test("empty result when thresholds exceed all degrees") {
    val g = TestGraphs.random(6, 6, 0.3, 11300)
    val edges = GraphFrames.toEdges(spark, g)
    assert(CoreDecomposition.alphaBetaCoreEdges(edges, 100, 100).count() == 0)
  }
}
