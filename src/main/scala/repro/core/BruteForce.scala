package repro.core

import repro.graph.{BipartiteGraph, VertexSets}
import scala.collection.mutable

/** Exhaustive reference enumerator — ground truth for every other
  * enumerator in the test suites.
  *
  * Scans all 2^nL · 2^nR induced subgraphs, keeps the k-biplexes, filters
  * the maximal ones by pairwise containment. Only usable on tiny graphs
  * (nL + nR ≲ 18).
  */
object BruteForce {

  /** All maximal k-biplexes of g, as a set. */
  def maximalKBiplexes(g: BipartiteGraph, k: Int): Set[Solution] = {
    require(g.nL <= 16 && g.nR <= 16, s"brute force on ${g.nL}x${g.nR} is too large")
    val all = mutable.ArrayBuffer.empty[Solution]
    val lefts = subsets(g.nL)
    val rights = subsets(g.nR)
    for (l <- lefts; r <- rights) {
      if (Biplex.isKBiplex(g, k, l, r)) all += Solution(l, r)
    }
    // Keep the inclusion-maximal ones.
    val out = all.filter { s =>
      !all.exists { t =>
        (t.size > s.size) &&
        VertexSets.subsetOf(s.left, t.left) && VertexSets.subsetOf(s.right, t.right)
      }
    }
    out.toSet
  }

  /** Maximal k-biplexes with both sides of size at least theta. */
  def largeMaximalKBiplexes(g: BipartiteGraph, k: Int, theta: Int): Set[Solution] =
    maximalKBiplexes(g, k).filter(s => s.left.length >= theta && s.right.length >= theta)

  private def subsets(n: Int): IndexedSeq[Array[Int]] =
    (0 until (1 << n)).map { mask =>
      (0 until n).filter(i => (mask & (1 << i)) != 0).toArray
    }
}
