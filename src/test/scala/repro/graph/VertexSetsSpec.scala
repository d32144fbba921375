package repro.graph

import repro.SparkSpec
import scala.util.Random

/** Sorted-int-array set algebra vs reference Set semantics. */
class VertexSetsSpec extends SparkSpec {

  private def randomSet(rnd: Random, max: Int): Array[Int] =
    VertexSets.canonical((0 until rnd.nextInt(max)).map(_ => rnd.nextInt(max)))

  test("canonical sorts and dedups") {
    assert(VertexSets.canonical(Seq(3, 1, 3, 2, 1)).toSeq == Seq(1, 2, 3))
    assert(VertexSets.canonical(Nil).isEmpty)
  }

  for (seed <- 1 to 8) {
    test(s"set ops match Set semantics (seed $seed)") {
      val rnd = new Random(seed)
      for (_ <- 0 until 200) {
        val a = randomSet(rnd, 20)
        val b = randomSet(rnd, 20)
        val sa = a.toSet
        val sb = b.toSet
        assert(VertexSets.intersect(a, b).toSet == (sa & sb))
        assert(VertexSets.intersectCount(a, b) == (sa & sb).size)
        assert(VertexSets.diff(a, b).toSet == (sa -- sb))
        assert(VertexSets.union(a, b).toSet == (sa ++ sb))
        assert(VertexSets.subsetOf(a, b) == sa.subsetOf(sb))
        val x = rnd.nextInt(20)
        assert(VertexSets.add(a, x).toSet == (sa + x))
        assert(VertexSets.remove(a, x).toSet == (sa - x))
        assert(VertexSets.contains(a, x) == sa.contains(x))
      }
    }
  }

  test("results stay sorted and duplicate-free") {
    val rnd = new Random(99)
    for (_ <- 0 until 100) {
      val a = randomSet(rnd, 15)
      val b = randomSet(rnd, 15)
      for (r <- Seq(VertexSets.intersect(a, b), VertexSets.diff(a, b),
                    VertexSets.union(a, b), VertexSets.add(a, 7), VertexSets.remove(a, 3))) {
        assert(r.toSeq == r.toSeq.distinct.sorted)
      }
    }
  }

  test("add is a no-op on present element, remove on absent") {
    val a = Array(1, 3, 5)
    assert(VertexSets.add(a, 3).toSeq == Seq(1, 3, 5))
    assert(VertexSets.remove(a, 4).toSeq == Seq(1, 3, 5))
  }

  test("empty-set edge cases") {
    val e = VertexSets.empty
    assert(VertexSets.intersect(e, Array(1)).isEmpty)
    assert(VertexSets.union(e, Array(1)).toSeq == Seq(1))
    assert(VertexSets.diff(e, Array(1)).isEmpty)
    assert(VertexSets.subsetOf(e, e))
    assert(VertexSets.intersectCount(e, e) == 0)
  }
}
