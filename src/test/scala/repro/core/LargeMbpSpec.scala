package repro.core

import repro.{SparkSpec, TestGraphs}

class LargeMbpSpec extends SparkSpec {

  for (k <- 1 to 2; theta <- 1 to 3) {
    test(s"LargeMbp equals filtered brute force (k=$k, theta=$theta)") {
      for ((g, seed) <- TestGraphs.smallBatch(35, maxSide = 6, seed = 6000 + k * 10 + theta)) {
        val exp = BruteForce.largeMaximalKBiplexes(g, k, theta)
        val got = LargeMbp.collectAll(g, k, theta, theta)
        assert(got == exp,
          s"seed $seed k=$k theta=$theta:\n missing ${(exp -- got).take(5)}\n extra ${(got -- exp).take(5)}")
      }
    }
  }

  test("asymmetric thresholds (thetaL != thetaR)") {
    for ((g, seed) <- TestGraphs.smallBatch(25, maxSide = 6, seed = 6100)) {
      val exp = BruteForce.maximalKBiplexes(g, 1)
        .filter(s => s.left.length >= 1 && s.right.length >= 3)
      val got = LargeMbp.collectAll(g, 1, 1, 3)
      assert(got == exp, s"seed $seed")
    }
  }

  test("results carry original vertex ids after core reduction") {
    val g = TestGraphs.random(8, 8, 0.5, 777)
    LargeMbp.enumerate(g, 1, 2, 2, s => {
      assert(Biplex.isMaximalKBiplex(g, 1, s.left, s.right), s"$s not maximal in original graph")
      true
    })
  }

  test("no large MBPs when theta exceeds the graph") {
    val g = TestGraphs.random(3, 3, 0.5, 778)
    assert(LargeMbp.collectAll(g, 1, 5, 5).isEmpty)
  }

  test("theta = 1 equals unconstrained enumeration") {
    for ((g, seed) <- TestGraphs.smallBatch(15, maxSide = 5, seed = 6200)) {
      val exp = BruteForce.maximalKBiplexes(g, 1)
        .filter(s => s.left.nonEmpty && s.right.nonEmpty)
      val got = LargeMbp.collectAll(g, 1, 1, 1)
      assert(got == exp, s"seed $seed")
    }
  }
}
