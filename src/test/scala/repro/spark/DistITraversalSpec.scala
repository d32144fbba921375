package repro.spark

import repro.{SparkSpec, TestGraphs}
import repro.core.{BruteForce, ReverseSearch, TraversalConfig}

class DistITraversalSpec extends SparkSpec {

  for (k <- 1 to 2) {
    test(s"distributed solution set equals local iTraversal and brute force (k=$k)") {
      for ((g, seed) <- TestGraphs.smallBatch(6, maxSide = 5, seed = 12000 + k)) {
        val dist = DistITraversal.collectSolutions(spark, g, k)
        val (local, _) = ReverseSearch.collectAll(g, k, TraversalConfig.iTraversal)
        val brute = BruteForce.maximalKBiplexes(g, k)
        assert(dist == brute, s"seed $seed: distributed != brute force")
        assert(local == brute, s"seed $seed: local != brute force")
      }
    }
  }

  test("distributed run on a mid-size ER graph matches local") {
    val g = repro.gen.BipartiteGen.er(40, 40, 200, seed = 12100)
    val dist = DistITraversal.collectSolutions(spark, g, 1)
    val (local, _) = ReverseSearch.collectAll(g, 1, TraversalConfig.iTraversal)
    assert(dist == local)
    assert(dist.nonEmpty)
  }

  test("maxPerTask caps are respected and results stay valid MBPs") {
    val g = repro.gen.BipartiteGen.er(30, 30, 150, seed = 12200)
    val df = DistITraversal.enumerate(spark, g, 1, maxPerTask = 3)
    val sols = df.collect().map(r => repro.core.Solution.of(r.getSeq[Int](0), r.getSeq[Int](1)))
    sols.foreach { s =>
      assert(repro.core.Biplex.isMaximalKBiplex(g, 1, s.left, s.right))
    }
  }
}
