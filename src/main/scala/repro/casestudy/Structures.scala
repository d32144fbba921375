package repro.casestudy

import repro.baselines.IMB
import repro.core.{Biplex, LargeMbp, Solution}
import repro.core.CoreReduction
import repro.graph.{BipartiteGraph, VertexSets}
import scala.collection.mutable

/** The four cohesive structures compared in the fraud-detection case study
  * (Section 6.3), plus the precision/recall/F1 metrics.
  *
  * Detection protocol (as in the paper): find all instances of a structure
  * with size constraints (θL users, θR products), then classify every
  * vertex involved in any found instance as fake.
  */
object Structures {

  /** Maximal bicliques with size thresholds — a biclique is a 0-biplex, so
    * the IMB branch-and-bound runs with k = 0.
    */
  def bicliques(g: BipartiteGraph, thetaL: Int, thetaR: Int, deadlineNanos: Long = Long.MaxValue): Set[Solution] = {
    val out = mutable.HashSet.empty[Solution]
    IMB.enumerate(g, 0, s => { out += s; true }, thetaL, thetaR, deadlineNanos)
    out.toSet
  }

  /** Large maximal k-biplexes via the Section-5 pipeline. */
  def kBiplexes(g: BipartiteGraph, k: Int, thetaL: Int, thetaR: Int, deadlineNanos: Long = Long.MaxValue): Set[Solution] = {
    val out = mutable.HashSet.empty[Solution]
    LargeMbp.enumerate(g, k, thetaL, thetaR, s => { out += s; true }, deadlineNanos = deadlineNanos)
    out.toSet
  }

  /** The (α,β)-core as one detected vertex set (left ids, right ids). */
  def alphaBetaCore(g: BipartiteGraph, alpha: Int, beta: Int): (Set[Int], Set[Int]) = {
    val (ls, rs) = CoreReduction.alphaBetaCore(g, alpha, beta)
    (ls.toSet, rs.toSet)
  }

  /** δ-quasi-biclique predicate: every left vertex misses ≤ δ·|R| edges,
    * every right vertex misses ≤ δ·|L|.
    */
  def isDeltaQB(g: BipartiteGraph, delta: Double, l: Array[Int], r: Array[Int]): Boolean =
    l.forall(v => Biplex.dbarL(g, v, r) <= delta * r.length) &&
      r.forall(u => Biplex.dbarR(g, u, l) <= delta * l.length)

  /** δ-quasi-bicliques with sizes ≥ (θL, θR).
    *
    * The paper gives no enumeration algorithm for δ-QBs (the structure is
    * not hereditary); following its own observation that a δ-QB of side
    * sizes ≈ θ is a ⌈θδ⌉-biplex, we seed with large ⌈max(θL,θR)·δ⌉-biplexes
    * and greedily extend each under the δ-QB predicate, keeping the
    * extensions that satisfy the predicate and the size thresholds. The
    * case-study metric only consumes the union of detected vertices, which
    * near-threshold seeds dominate. (Documented substitution — DESIGN.md.)
    */
  def deltaQuasiBicliques(
      g: BipartiteGraph,
      delta: Double,
      thetaL: Int,
      thetaR: Int,
      deadlineNanos: Long = Long.MaxValue,
  ): Set[Solution] = {
    val kSeed = math.max(1, math.ceil(delta * math.max(thetaL, thetaR)).toInt)
    val seeds = kBiplexes(g, kSeed, thetaL, thetaR, deadlineNanos)
    seeds.iterator
      .map { s =>
        var l = s.left
        var r = s.right
        var grown = true
        while (grown) {
          grown = false
          val lc = Biplex.leftCandidates(g, math.max(1, (delta * r.length).toInt), l, r)
          val lAdd = lc.find(v => isDeltaQB(g, delta, VertexSets.add(l, v), r))
          lAdd.foreach { v => l = VertexSets.add(l, v); grown = true }
          if (!grown) {
            val fg = g.flipped
            val rc = Biplex.leftCandidates(fg, math.max(1, (delta * l.length).toInt), r, l)
            val rAdd = rc.find(u => isDeltaQB(g, delta, l, VertexSets.add(r, u)))
            rAdd.foreach { u => r = VertexSets.add(r, u); grown = true }
          }
        }
        Solution(l, r)
      }
      .filter(s =>
        s.left.length >= thetaL && s.right.length >= thetaR &&
          isDeltaQB(g, delta, s.left, s.right))
      .toSet
  }

  /** Precision / recall / F1 over the union of vertices in the found
    * structures, with fake users + fake products as ground truth. F1 is
    * Double.NaN when nothing is found ("ND" in Figure 13).
    */
  final case class Metrics(precision: Double, recall: Double, f1: Double, foundVertices: Int)

  def metrics(
      foundL: Set[Int],
      foundR: Set[Int],
      trueL: Set[Int],
      trueR: Set[Int],
  ): Metrics = {
    val tp = (foundL & trueL).size + (foundR & trueR).size
    val found = foundL.size + foundR.size
    val truth = trueL.size + trueR.size
    if (found == 0) Metrics(Double.NaN, 0.0, Double.NaN, 0)
    else {
      val p = tp.toDouble / found
      val r = tp.toDouble / truth
      val f1 = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
      Metrics(p, r, f1, found)
    }
  }

  /** Vertex union of a set of solutions. */
  def vertexUnion(sols: Set[Solution]): (Set[Int], Set[Int]) =
    (sols.flatMap(_.left.toSet), sols.flatMap(_.right.toSet))
}
