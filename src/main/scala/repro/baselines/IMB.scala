package repro.baselines

import repro.core.{Biplex, Solution}
import repro.graph.{BipartiteGraph, VertexSets}

/** iMB-style baseline: branch-and-bound set-enumeration of maximal
  * k-biplexes (Sim et al. / Yu et al., the paper's first baseline).
  *
  * Classic include/exclude backtracking for hereditary properties: branch
  * on one candidate vertex at a time, filter candidate and exclusion sets
  * to individually-addable vertices, and emit at leaves with an empty
  * exclusion set. The size-threshold prunings (|L| + |candL| < θ etc.) are
  * the kind of pruning iMB relies on — without a size constraint the
  * algorithm degrades to plain exponential-delay backtracking, which is the
  * behaviour the paper reports.
  *
  * Setting k = 0 enumerates maximal bicliques (used by the case study).
  */
object IMB {

  /** Enumerate maximal k-biplexes with |L| ≥ thetaL and |R| ≥ thetaR.
    *
    * `sink` returning false aborts; returns false iff aborted (by sink or
    * deadline).
    */
  def enumerate(
      g: BipartiteGraph,
      k: Int,
      sink: Solution => Boolean,
      thetaL: Int = 0,
      thetaR: Int = 0,
      deadlineNanos: Long = Long.MaxValue,
  ): Boolean = repro.core.BigStack.run {

    // Candidate filtering dominates on large graphs; the deadline must be
    // polled inside the filter loops, not only between recursion levels.
    var timedOut = false
    def filt(arr: Array[Int], pred: Int => Boolean): Array[Int] = {
      val out = new scala.collection.mutable.ArrayBuffer[Int](arr.length)
      var i = 0
      while (i < arr.length && !timedOut) {
        if ((i & 255) == 0 && System.nanoTime >= deadlineNanos) timedOut = true
        else if (pred(arr(i))) out += arr(i)
        i += 1
      }
      out.toArray
    }

    def rec(
        l: Array[Int], r: Array[Int],
        candL: Array[Int], candR: Array[Int],
        exclL: Array[Int], exclR: Array[Int],
    ): Boolean = {
      if (timedOut || System.nanoTime >= deadlineNanos) return false
      // Size-bound pruning: even taking every candidate cannot reach theta.
      if (l.length + candL.length < thetaL) return true
      if (r.length + candR.length < thetaR) return true
      if (candL.isEmpty && candR.isEmpty) {
        if (exclL.isEmpty && exclR.isEmpty && l.length >= thetaL && r.length >= thetaR)
          return sink(Solution(l, r))
        return true
      }
      if (candL.nonEmpty) {
        val w = candL(0)
        val rest = candL.drop(1)
        // Include w.
        val l2 = VertexSets.add(l, w)
        val cL = filt(rest, x => Biplex.addableL(g, k, x, l2, r))
        val cR = filt(candR, x => Biplex.addableR(g, k, x, l2, r))
        val eL = filt(exclL, x => Biplex.addableL(g, k, x, l2, r))
        val eR = filt(exclR, x => Biplex.addableR(g, k, x, l2, r))
        if (timedOut || !rec(l2, r, cL, cR, eL, eR)) return false
        // Exclude w.
        rec(l, r, rest, candR, VertexSets.add(exclL, w), exclR)
      } else {
        val w = candR(0)
        val rest = candR.drop(1)
        val r2 = VertexSets.add(r, w)
        val cL = filt(candL, x => Biplex.addableL(g, k, x, l, r2))
        val cR = filt(rest, x => Biplex.addableR(g, k, x, l, r2))
        val eL = filt(exclL, x => Biplex.addableL(g, k, x, l, r2))
        val eR = filt(exclR, x => Biplex.addableR(g, k, x, l, r2))
        if (timedOut || !rec(l, r2, cL, cR, eL, eR)) return false
        rec(l, r, candL, rest, exclL, VertexSets.add(exclR, w))
      }
    }

    rec(
      VertexSets.empty, VertexSets.empty,
      Array.range(0, g.nL), Array.range(0, g.nR),
      VertexSets.empty, VertexSets.empty,
    )
  }

  /** Collect all (small graphs / tests). */
  def collectAll(g: BipartiteGraph, k: Int, thetaL: Int = 0, thetaR: Int = 0): Set[Solution] = {
    val out = scala.collection.mutable.HashSet.empty[Solution]
    enumerate(g, k, s => { out += s; true }, thetaL, thetaR)
    out.toSet
  }
}
