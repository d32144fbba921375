package repro.graph

import repro.{SparkSpec, TestGraphs}

class InflationSpec extends SparkSpec {

  test("inflate adds exactly the two side cliques") {
    for ((g, seed) <- TestGraphs.smallBatch(20, maxSide = 6)) {
      val inf = Inflation.inflate(g)
      val expected = g.numEdges +
        g.nL.toLong * (g.nL - 1) / 2 + g.nR.toLong * (g.nR - 1) / 2
      assert(inf.n == g.nL + g.nR, s"seed $seed")
      assert(inf.numEdges == expected, s"seed $seed")
    }
  }

  test("inflated adjacency matches: same-side always, cross-side iff edge") {
    for ((g, seed) <- TestGraphs.smallBatch(15, maxSide = 6)) {
      val inf = Inflation.inflate(g)
      for (a <- 0 until g.nL; b <- 0 until g.nL if a != b)
        assert(inf.hasEdge(a, b), s"left clique broken, seed $seed")
      for (a <- 0 until g.nR; b <- 0 until g.nR if a != b)
        assert(inf.hasEdge(g.nL + a, g.nL + b), s"right clique broken, seed $seed")
      for (v <- 0 until g.nL; u <- 0 until g.nR)
        assert(inf.hasEdge(v, g.nL + u) == g.hasEdge(v, u), s"cross edge wrong, seed $seed")
    }
  }

  test("inflated adjacency arrays are sorted") {
    val g = TestGraphs.random(5, 7, 0.4, 3)
    val inf = Inflation.inflate(g)
    for (v <- 0 until inf.n) {
      assert(inf.adj(v).toSeq == inf.adj(v).toSeq.sorted.distinct)
      assert(!inf.adj(v).contains(v), "self loop")
    }
  }

  test("inflateSub on a vertex subset matches inflate of the induced subgraph") {
    val g = TestGraphs.random(6, 6, 0.5, 9)
    val ls = Array(1, 3, 4)
    val rs = Array(0, 2, 5)
    val (inf, back) = Inflation.inflateSub(g, ls, rs)
    val (sub, _, _) = g.inducedSubgraph(ls, rs)
    val ref = Inflation.inflate(sub)
    assert(inf.n == ref.n && inf.numEdges == ref.numEdges)
    for (a <- 0 until inf.n; b <- 0 until inf.n if a != b)
      assert(inf.hasEdge(a, b) == ref.hasEdge(a, b))
    assert(back.toSeq == Seq(1, 3, 4, 0, 2, 5))
  }

  test("inflateSub back-mapping points to original ids") {
    val g = TestGraphs.random(4, 4, 0.6, 13)
    val ls = Array(0, 2)
    val rs = Array(1, 3)
    val (inf, back) = Inflation.inflateSub(g, ls, rs)
    // Cross edges agree with the original graph through the mapping.
    for (i <- 0 until ls.length; j <- 0 until rs.length) {
      assert(inf.hasEdge(i, ls.length + j) == g.hasEdge(back(i), back(ls.length + j)))
    }
  }
}
