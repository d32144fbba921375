package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.graph.BipartiteGraph

class BruteForceSpec extends SparkSpec {

  test("complete bipartite graph: the whole graph is the only MBP") {
    val g = TestGraphs.complete(3, 4)
    for (k <- 0 to 2) {
      val sols = BruteForce.maximalKBiplexes(g, k)
      assert(sols == Set(Solution.of(0 until 3, 0 until 4)), s"k=$k")
    }
  }

  test("empty graph, k=0: the two one-sided solutions") {
    val g = TestGraphs.empty(2, 3)
    val sols = BruteForce.maximalKBiplexes(g, 0)
    // With no edges, a 0-biplex cannot mix sides; maximal are (L,∅) and (∅,R).
    assert(sols == Set(Solution.of(0 until 2, Nil), Solution.of(Nil, 0 until 3)))
  }

  test("empty graph, k large: whole graph becomes one MBP") {
    val g = TestGraphs.empty(2, 2)
    val sols = BruteForce.maximalKBiplexes(g, 2)
    assert(sols == Set(Solution.of(0 until 2, 0 until 2)))
  }

  test("single edge, k=1") {
    val g = BipartiteGraph.fromEdges(2, 2, Seq((0, 0)))
    val sols = BruteForce.maximalKBiplexes(g, 1)
    // Every solution is a maximal 1-biplex and they cover all vertices.
    sols.foreach(s => assert(Biplex.isMaximalKBiplex(g, 1, s.left, s.right)))
    assert(sols.nonEmpty)
  }

  test("every reported solution is a maximal k-biplex; no duplicates; none contained in another") {
    for (k <- 0 to 2; (g, seed) <- TestGraphs.smallBatch(25, maxSide = 5, seed = 2000 + k)) {
      val sols = BruteForce.maximalKBiplexes(g, k).toSeq
      sols.foreach { s =>
        assert(Biplex.isKBiplex(g, k, s.left, s.right), s"seed $seed")
        assert(Biplex.isMaximal(g, k, s.left, s.right), s"seed $seed: $s")
      }
      for (a <- sols; b <- sols if a != b) {
        assert(!(repro.graph.VertexSets.subsetOf(a.left, b.left) &&
                 repro.graph.VertexSets.subsetOf(a.right, b.right)), s"seed $seed: $a ⊆ $b")
      }
    }
  }

  test("large filter matches size predicate") {
    for ((g, _) <- TestGraphs.smallBatch(10, maxSide = 5, seed = 2100)) {
      val all = BruteForce.maximalKBiplexes(g, 1)
      val large = BruteForce.largeMaximalKBiplexes(g, 1, 2)
      assert(large == all.filter(s => s.left.length >= 2 && s.right.length >= 2))
    }
  }

  test("maximality covers both sides: adding any vertex breaks the property") {
    for ((g, seed) <- TestGraphs.smallBatch(10, maxSide = 5, seed = 2200)) {
      val sols = BruteForce.maximalKBiplexes(g, 1)
      sols.foreach { s =>
        for (v <- 0 until g.nL if !s.left.contains(v))
          assert(!Biplex.isKBiplex(g, 1, repro.graph.VertexSets.add(s.left, v), s.right), s"seed $seed")
        for (u <- 0 until g.nR if !s.right.contains(u))
          assert(!Biplex.isKBiplex(g, 1, s.left, repro.graph.VertexSets.add(s.right, u)), s"seed $seed")
      }
    }
  }
}
