package repro.casestudy

import repro.{SparkSpec, TestGraphs}
import repro.core.{BruteForce, Solution}

class StructuresSpec extends SparkSpec {

  test("bicliques: every found structure is complete and meets thresholds") {
    for ((g, seed) <- TestGraphs.smallBatch(20, maxSide = 6, seed = 13000)) {
      val found = Structures.bicliques(g, 2, 2)
      found.foreach { s =>
        assert(s.left.length >= 2 && s.right.length >= 2, s"seed $seed")
        for (v <- s.left; u <- s.right) assert(g.hasEdge(v, u), s"seed $seed")
      }
      val exp = BruteForce.maximalKBiplexes(g, 0)
        .filter(s => s.left.length >= 2 && s.right.length >= 2)
      assert(found == exp, s"seed $seed")
    }
  }

  test("kBiplexes matches brute-force large MBPs") {
    for ((g, seed) <- TestGraphs.smallBatch(20, maxSide = 6, seed = 13100)) {
      val found = Structures.kBiplexes(g, 1, 2, 2)
      assert(found == BruteForce.largeMaximalKBiplexes(g, 1, 2), s"seed $seed")
    }
  }

  test("isDeltaQB predicate") {
    val g = TestGraphs.complete(3, 3)
    assert(Structures.isDeltaQB(g, 0.0, Array(0, 1, 2), Array(0, 1, 2)))
    val e = TestGraphs.empty(3, 3)
    assert(!Structures.isDeltaQB(e, 0.3, Array(0, 1, 2), Array(0, 1, 2)))
    assert(Structures.isDeltaQB(e, 1.0, Array(0, 1, 2), Array(0, 1, 2)))
  }

  test("deltaQuasiBicliques outputs satisfy the predicate and thresholds") {
    for ((g, seed) <- TestGraphs.smallBatch(15, maxSide = 6, seed = 13200)) {
      val found = Structures.deltaQuasiBicliques(g, 0.3, 2, 2)
      found.foreach { s =>
        assert(s.left.length >= 2 && s.right.length >= 2, s"seed $seed")
        assert(Structures.isDeltaQB(g, 0.3, s.left, s.right), s"seed $seed")
      }
    }
  }

  test("metrics: perfect detection") {
    val m = Structures.metrics(Set(1, 2), Set(3), Set(1, 2), Set(3))
    assert(m.precision == 1.0 && m.recall == 1.0 && m.f1 == 1.0)
  }

  test("metrics: nothing found is ND") {
    val m = Structures.metrics(Set.empty, Set.empty, Set(1), Set(2))
    assert(m.precision.isNaN && m.recall == 0.0 && m.f1.isNaN)
  }

  test("metrics: partial overlap") {
    // found = {1,2} ∪ {9}; truth = {1} ∪ {9,8}: tp=2, found=3, truth=3.
    val m = Structures.metrics(Set(1, 2), Set(9), Set(1), Set(9, 8))
    assert(math.abs(m.precision - 2.0 / 3) < 1e-9)
    assert(math.abs(m.recall - 2.0 / 3) < 1e-9)
    assert(math.abs(m.f1 - 2.0 / 3) < 1e-9)
  }

  test("vertexUnion collects both sides") {
    val sols = Set(Solution.of(Seq(1), Seq(2)), Solution.of(Seq(3), Seq(2, 4)))
    assert(Structures.vertexUnion(sols) == (Set(1, 3), Set(2, 4)))
  }

  test("alphaBetaCore detection returns core vertex sets") {
    val g = TestGraphs.complete(3, 4)
    val (l, r) = Structures.alphaBetaCore(g, 2, 2)
    assert(l == Set(0, 1, 2) && r == Set(0, 1, 2, 3))
    val (l2, r2) = Structures.alphaBetaCore(g, 5, 5)
    assert(l2.isEmpty && r2.isEmpty)
  }
}
