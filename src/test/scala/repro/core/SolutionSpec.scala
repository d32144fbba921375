package repro.core

import repro.SparkSpec

class SolutionSpec extends SparkSpec {

  test("equality and hashCode are structural") {
    val a = Solution.of(Seq(2, 1), Seq(3))
    val b = Solution.of(Seq(1, 2), Seq(3))
    assert(a == b)
    assert(a.hashCode == b.hashCode)
    assert(a != Solution.of(Seq(1), Seq(3)))
  }

  test("key disambiguates the two sides") {
    // ({0,1}, {}) vs ({0}, {1}) must have different keys even when nL = 2.
    val a = Solution.of(Seq(0, 1), Nil)
    val b = Solution.of(Seq(0), Seq(1))
    assert(a.key(2) != b.key(2))
    // Left ids and right ids never collide in the key space.
    assert(Solution.of(Seq(3), Nil).key(4) != Solution.of(Nil, Seq(3)).key(4))
  }

  test("flip swaps sides") {
    val s = Solution.of(Seq(1, 2), Seq(5))
    assert(s.flip == Solution.of(Seq(5), Seq(1, 2)))
    assert(s.flip.flip == s)
  }

  test("of canonicalizes input") {
    val s = Solution.of(Seq(3, 1, 3), Seq(2, 2))
    assert(s.left.toSeq == Seq(1, 3))
    assert(s.right.toSeq == Seq(2))
    assert(s.size == 3)
  }
}
