package repro.core

import repro.graph.VertexSets

/** One (maximal) k-biplex: sorted left ids + sorted right ids.
  *
  * `key` is the canonical dedup key stored in the visited set (the paper's
  * B-tree): left ids followed by right ids offset by `nL`, making two
  * solutions equal iff they induce the same vertex set.
  */
final case class Solution(left: Array[Int], right: Array[Int]) {

  /** Canonical key for dedup; nL disambiguates the two id spaces. */
  def key(nL: Int): Vector[Int] =
    (left.iterator ++ right.iterator.map(_ + nL)).toVector

  def size: Int = left.length + right.length

  /** Sides swapped (for algorithms that run on the flipped graph). */
  def flip: Solution = Solution(right, left)

  override def equals(o: Any): Boolean = o match {
    case s: Solution =>
      java.util.Arrays.equals(left, s.left) && java.util.Arrays.equals(right, s.right)
    case _ => false
  }

  override def hashCode: Int =
    31 * java.util.Arrays.hashCode(left) + java.util.Arrays.hashCode(right)

  override def toString: String =
    s"({${left.mkString(",")}},{${right.mkString(",")}})"
}

object Solution {
  val empty: Solution = Solution(VertexSets.empty, VertexSets.empty)

  def of(left: Iterable[Int], right: Iterable[Int]): Solution =
    Solution(VertexSets.canonical(left), VertexSets.canonical(right))
}
