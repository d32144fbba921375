package repro.core

import repro.graph.{BipartiteGraph, VertexSets}
import scala.collection.mutable

/** Statistics of one enumeration run.
  *
  * `links` counts the links of the (variant-specific) solution graph that
  * the DFS traversed: one per (H, v, H_loc) triple surviving the variant's
  * prunings — the quantity plotted in Figure 11. `easCalls` counts
  * EnumAlmostSat invocations (almost-satisfying graphs formed).
  */
final case class EnumStats(
    solutions: Long,
    links: Long,
    easCalls: Long,
    aborted: Boolean,
    millis: Long,
)

/** Configuration of the reverse-search engine.
  *
  * @param leftAnchored  start from H0 = (L0, R_all) and seed almost-satisfying
  *                      graphs with left vertices only (Section 3.3)
  * @param rightShrinking discard local solutions that still admit a right
  *                      vertex and extend with left vertices only (Section 3.4)
  * @param exclusion     prune links toward solutions containing a vertex of
  *                      the exclusion set (Section 3.5); requires leftAnchored
  * @param inheritExclusion child nodes inherit the parent's exclusion set
  * @param eas           EnumAlmostSat implementation (Section 4)
  * @param theta         large-MBP mode (θL, θR): report only solutions with
  *                      |L| >= θL and |R| >= θR and apply the Section-5
  *                      prunings (requires rightShrinking)
  * @param twoHopSeeds   restrict almost-satisfying-graph seeds at a node
  *                      (L, R) to left vertices with Γ(v) ∩ R ≠ ∅. Lossless
  *                      for every MBP whose right side exceeds k: any left
  *                      vertex v of such an MBP has Γ(v) ∩ R'' ≠ ∅
  *                      (δ̄(v,R'') ≤ k < |R''|), so the canonical
  *                      left-anchored path (Section 3.3) only ever seeds
  *                      with such vertices. Solutions with |R| ≤ k may be
  *                      skipped — this is the scalability mode used by the
  *                      large-graph benchmarks, mirroring how the paper's
  *                      implementation reaches billion-edge graphs.
  */
final case class TraversalConfig(
    leftAnchored: Boolean,
    rightShrinking: Boolean,
    exclusion: Boolean,
    inheritExclusion: Boolean = true,
    eas: EnumAlmostSat.Variant = EnumAlmostSat.L20R20,
    theta: Option[(Int, Int)] = None,
    twoHopSeeds: Boolean = false,
) {
  require(!exclusion || leftAnchored, "exclusion strategy requires left-anchored traversal")
  require(theta.isEmpty || rightShrinking, "size-constrained mode requires right-shrinking traversal")
}

object TraversalConfig {
  /** Algorithm 1 with the inflation-based EnumAlmostSat (paper's bTraversal). */
  val bTraversal: TraversalConfig =
    TraversalConfig(leftAnchored = false, rightShrinking = false, exclusion = false,
      eas = EnumAlmostSat.Inflated)

  /** Algorithm 2, all three techniques (paper's iTraversal). */
  val iTraversal: TraversalConfig =
    TraversalConfig(leftAnchored = true, rightShrinking = true, exclusion = true)

  /** iTraversal without the exclusion strategy. */
  val iTraversalNoES: TraversalConfig = iTraversal.copy(exclusion = false)

  /** iTraversal without exclusion and right-shrinking (left-anchored only). */
  val iTraversalNoESNoRS: TraversalConfig =
    iTraversal.copy(exclusion = false, rightShrinking = false)
}

/** Reverse-search enumeration of maximal k-biplexes: a DFS over the implicit
  * solution graph, parameterized by the paper's three sparsification
  * techniques (bTraversal = none, iTraversal = all).
  */
object ReverseSearch {

  /** Restriction of the root expansion — used by the distributed runner to
    * ship one root-level subtree per task.
    *
    * @param seeds     left seeds to process at the root (deeper levels are
    *                  unrestricted)
    * @param exclusion initial exclusion set (the snapshot the sequential
    *                  run would have had when reaching the first seed)
    * @param emitRoot  whether H0 itself is reported
    */
  final case class RootRestrict(seeds: Array[Int], exclusion: Array[Int], emitRoot: Boolean)

  /** Enumerate maximal k-biplexes of g.
    *
    * `sink` receives each solution exactly once (pre-order); returning
    * false aborts the run ("first N MBPs"). `deadlineNanos` (absolute,
    * System.nanoTime scale) aborts long runs — the paper's INF budget.
    *
    * The DFS runs in a dedicated 512 MB-stack thread because solution
    * graphs can be deep.
    */
  def run(
      g: BipartiteGraph,
      k: Int,
      cfg: TraversalConfig,
      sink: Solution => Boolean,
      deadlineNanos: Long = Long.MaxValue,
      rootRestrict: Option[RootRestrict] = None,
  ): EnumStats = BigStack.run {
    val t0 = System.nanoTime
    var solutions = 0L
    var links = 0L
    var easCalls = 0L
    var deadlineHit = false
    val (thetaL, thetaR) = cfg.theta.getOrElse((0, 0))
    val visited = new mutable.HashSet[Vector[Int]]

    def timeUp(): Boolean = {
      val up = System.nanoTime >= deadlineNanos
      if (up) deadlineHit = true
      up
    }

    /** Report a newly found solution; false aborts the whole run. */
    def report(s: Solution): Boolean = {
      if (s.left.length < thetaL || s.right.length < thetaR) true
      else { solutions += 1; sink(s) }
    }

    /** The (i)ThreeStep procedure from solution (l, r) with exclusion set x.
      * `seedFilter` restricts the seeds processed at this node (root-level
      * task splitting); recursive calls are unrestricted.
      */
    def expand(l: Array[Int], r: Array[Int], x: Array[Int], seedFilter: Int => Boolean = _ => true): Boolean = {
      if (r.length < thetaR) return true // solution pruning
      if (cfg.exclusion && g.nL - x.length < thetaL) return true // left-side pruning
      var xCur = x
      var ok = true
      // Disconnection structures of (l, r), shared by every seed's
      // EnumAlmostSat call (one ThreeStep = one solution).
      lazy val ctx = EnumAlmostSat.buildCtx(g, l, r)
      var curSeed = -1 // current left seed, for the fast line-7 check

      // `lFull`/`rPrime` are always in original orientation (left, right);
      // for right-side seeds the extension runs on the flipped graph.
      def handleLocal(lFull: Array[Int], rPrime: Array[Int], flippedSeed: Boolean): Boolean = {
        if (timeUp()) return false
        // Right-shrinking traversal (Algorithm 2 line 7): drop local
        // solutions that still admit a vertex from the right universe.
        // Fast path: when the seed v is saturated (δ̄(v,R') = k), every
        // right vertex outside R' that disconnects v is blocked by v, so
        // only Γ(v) \ R' needs checking.
        if (cfg.rightShrinking) {
          val admits =
            if (curSeed >= 0) admitsRightVertex(g, k, ctx, curSeed, lFull, rPrime)
            else Biplex.existsAddableRight(g, k, lFull, rPrime)
          if (admits) return true
        }
        if (cfg.exclusion && intersects(lFull, xCur)) return true
        val ext =
          if (flippedSeed)
            Biplex.extend(g.flipped, k, rPrime, lFull, leftOnly = false).flip
          else
            Biplex.extend(
              g, k, lFull, rPrime,
              leftOnly = cfg.rightShrinking,
              deferLeft = if (cfg.exclusion && xCur.nonEmpty) Some(xv => VertexSets.contains(xCur, xv)) else None,
            )
        links += 1
        if (cfg.exclusion && intersects(ext.left, xCur)) return true
        val key = ext.key(g.nL)
        if (!visited.contains(key)) {
          visited += key
          if (!report(ext)) return false
          if (!expand(ext.left, ext.right, xCur)) return false
        }
        true
      }

      // Left-side seeds (all frameworks). In two-hop mode only vertices
      // neighbouring R are seeded (see TraversalConfig.twoHopSeeds).
      val leftSeeds: Iterator[Int] =
        if (cfg.twoHopSeeds && r.length < g.nR) {
          val lists = new Array[Array[Int]](r.length)
          var i = 0
          while (i < r.length) { lists(i) = g.adjR(r(i)); i += 1 }
          Biplex.atLeastCount(lists, 1).iterator
            .filter(v => seedFilter(v) && !VertexSets.contains(l, v))
        } else {
          (0 until g.nL).iterator.filter(v => seedFilter(v) && !VertexSets.contains(l, v))
        }
      while (ok && leftSeeds.hasNext) {
        val v = leftSeeds.next()
        if (timeUp()) { ok = false }
        else {
          // Almost-satisfying-graph pruning (Section 5).
          val skip = cfg.theta.isDefined &&
            VertexSets.intersectCount(g.adjL(v), r) + k < thetaR
          if (!skip) {
            easCalls += 1
            curSeed = v
            ok = EnumAlmostSat.run(
              g, k, l, r, v, cfg.eas,
              emit = (lf, rp) => handleLocal(lf, rp, flippedSeed = false),
              minRight = thetaR,
              deadlineNanos = deadlineNanos,
              ctx = if (cfg.eas == EnumAlmostSat.Inflated) null else ctx,
            )
            curSeed = -1
          }
          if (ok && cfg.exclusion) xCur = VertexSets.add(xCur, v)
        }
      }
      // Right-side seeds (bTraversal only; pruned by left-anchored traversal).
      if (ok && !cfg.leftAnchored) {
        val fg = g.flipped
        val rightSeeds = (0 until g.nR).iterator.filter(u => !VertexSets.contains(r, u))
        while (ok && rightSeeds.hasNext) {
          val u = rightSeeds.next()
          if (timeUp()) { ok = false }
          else {
            easCalls += 1
            ok = EnumAlmostSat.run(
              fg, k, r, l, u, cfg.eas,
              emit = (rf, lp) => handleLocal(lp, rf, flippedSeed = true),
              deadlineNanos = deadlineNanos,
            )
          }
        }
      }
      ok
    }

    val h0 =
      if (cfg.leftAnchored) Biplex.initialLeftAnchored(g, k)
      else Biplex.initialArbitrary(g, k)
    visited += h0.key(g.nL)
    rootRestrict match {
      case None =>
        if (report(h0)) expand(h0.left, h0.right, VertexSets.empty)
      case Some(rr) =>
        val proceed = if (rr.emitRoot) report(h0) else true
        if (proceed)
          expand(h0.left, h0.right, rr.exclusion, v => VertexSets.contains(rr.seeds, v))
    }
    // A deadline that fired inside EnumAlmostSat short-circuits without
    // passing through timeUp(); catch it here.
    if (System.nanoTime >= deadlineNanos) deadlineHit = true
    EnumStats(solutions, links, easCalls, deadlineHit, (System.nanoTime - t0) / 1000000)
  }

  /** Convenience: collect all solutions (tests / small graphs only). */
  def collectAll(g: BipartiteGraph, k: Int, cfg: TraversalConfig): (Set[Solution], EnumStats) = {
    val out = mutable.HashSet.empty[Solution]
    val stats = run(g, k, cfg, s => { out += s; true })
    (out.toSet, stats)
  }

  /** Convenience: collect the first n solutions. */
  def collectFirst(
      g: BipartiteGraph,
      k: Int,
      cfg: TraversalConfig,
      n: Int,
      deadlineNanos: Long = Long.MaxValue,
  ): (Vector[Solution], EnumStats) = {
    val out = Vector.newBuilder[Solution]
    var c = 0
    val stats = run(g, k, cfg, s => { out += s; c += 1; c < n }, deadlineNanos)
    (out.result(), stats)
  }

  private def intersects(a: Array[Int], b: Array[Int]): Boolean =
    VertexSets.intersectCount(a, b) > 0

  /** Right-shrinking test (Algorithm 2 line 7) for a local solution
    * (lFull = L' ∪ {v}, rPrime) of the node whose context is `ctx`:
    * does some u ∈ R_universe \ rPrime extend it to a k-biplex?
    *
    * Vertices of R \ R' are never addable (the local solution is locally
    * maximal), so only the saturation structure matters: an addable u must
    * connect every saturated member of lFull and have δ̄(u, lFull) ≤ k.
    * Saturation is read from ctx's ≤k-sized non-neighbour lists instead of
    * recomputed, which keeps this O(|L'|·k·log + Σdeg·log).
    */
  private def admitsRightVertex(
      g: BipartiteGraph,
      k: Int,
      ctx: EnumAlmostSat.SolutionCtx,
      v: Int,
      lFull: Array[Int],
      rPrime: Array[Int],
  ): Boolean = {
    if (rPrime.length == g.nR) return false
    // Saturated members of lFull: δ̄(w, R') == k.
    var sat = VertexSets.empty
    var i = 0
    while (i < lFull.length) {
      val w = lFull(i)
      val d =
        if (w == v) rPrime.length - VertexSets.intersectCount(g.adjL(v), rPrime)
        else {
          val nb = ctx.nbarL(ctx.posL(w))
          var c = 0
          var j = 0
          while (j < nb.length) {
            if (VertexSets.contains(rPrime, nb(j))) c += 1
            j += 1
          }
          c
        }
      if (d == k) sat = VertexSets.add(sat, w)
      i += 1
    }
    if (sat.nonEmpty) {
      // Candidates must be common neighbours of sat: scan the smallest list.
      var w0 = sat(0)
      var s = 1
      while (s < sat.length) { if (g.degL(sat(s)) < g.degL(w0)) w0 = sat(s); s += 1 }
      g.adjL(w0).exists { u =>
        !VertexSets.contains(rPrime, u) &&
        sat.forall(w => g.hasEdge(w, u)) &&
        lFull.length - VertexSets.intersectCount(g.adjR(u), lFull) <= k
      }
    } else if (lFull.length > k) {
      val lists = new Array[Array[Int]](lFull.length)
      i = 0
      while (i < lFull.length) { lists(i) = g.adjL(lFull(i)); i += 1 }
      Biplex.atLeastCount(lists, lFull.length - k).exists(u => !VertexSets.contains(rPrime, u))
    } else true
  }
}

/** Runs a thunk in a dedicated thread with a large stack — solution-graph
  * DFS recursion can be as deep as the number of solutions.
  */
object BigStack {
  def run[A](body: => A): A = {
    var out: Either[Throwable, A] = null
    val t = new Thread(null, () => {
      out = try Right(body) catch { case e: Throwable => Left(e) }
    }, "repro-bigstack", 512L * 1024 * 1024)
    t.start()
    t.join()
    out match {
      case Right(a) => a
      case Left(e)  => throw e
    }
  }
}
