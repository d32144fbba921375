package repro

import repro.graph.BipartiteGraph
import scala.util.Random

/** Deterministic random bipartite graphs for cross-validation tests.
  *
  * ScalaCheck-style property coverage is done with seeded loops (the
  * scalatest/scalacheck bridge artifact is not available offline), which
  * keeps every failure reproducible from the printed seed.
  */
object TestGraphs {

  /** Random bipartite graph with the given edge probability. */
  def random(nL: Int, nR: Int, p: Double, seed: Long): BipartiteGraph = {
    val rnd = new Random(seed)
    val edges = for {
      v <- 0 until nL
      u <- 0 until nR
      if rnd.nextDouble() < p
    } yield (v, u)
    BipartiteGraph.fromEdges(nL, nR, edges)
  }

  /** A batch of small random graphs covering sizes and densities. */
  def smallBatch(count: Int, maxSide: Int = 6, seed: Long = 1234): Seq[(BipartiteGraph, Long)] = {
    val rnd = new Random(seed)
    (0 until count).map { i =>
      val nL = 1 + rnd.nextInt(maxSide)
      val nR = 1 + rnd.nextInt(maxSide)
      val p = 0.15 + rnd.nextDouble() * 0.7
      val s = seed + 1000 + i
      (random(nL, nR, p, s), s)
    }
  }

  /** Complete bipartite graph. */
  def complete(nL: Int, nR: Int): BipartiteGraph =
    BipartiteGraph.fromEdges(nL, nR, for (v <- 0 until nL; u <- 0 until nR) yield (v, u))

  /** Graph with no edges. */
  def empty(nL: Int, nR: Int): BipartiteGraph =
    BipartiteGraph.fromEdges(nL, nR, Nil)
}
