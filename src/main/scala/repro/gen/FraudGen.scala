package repro.gen

import repro.graph.BipartiteGraph
import scala.collection.mutable
import scala.util.Random

/** Synthetic stand-in for the case study's "Amazon Review Data (software)"
  * with a FRAUDAR-style random camouflage attack (Section 6.3).
  *
  * Background: `nUsers` real users review `nProducts` real products with
  * Zipf-skewed popularity. Attack: `nFakeUsers` fake users and
  * `nFakeProducts` fake products are injected; each fake user posts
  * `commentsPerFake` *fake* comments on random fake products and the same
  * number of *camouflage* comments on random real products — the attack
  * model of Hooi et al. [21] that the paper evaluates against.
  *
  * Scaled from the paper (375K users / 21K products / 459K reviews, 2K×2K
  * block with 200K+200K comments) to run locally while keeping the
  * block-vs-background density contrast: the fake block has density
  * `commentsPerFake / nFakeProducts` ≈ 10%, orders of magnitude above the
  * background.
  */
object FraudGen {

  /** Generated instance: fake vertices occupy the *last* ids of each side. */
  final case class Instance(
      graph: BipartiteGraph,
      nRealUsers: Int,
      nRealProducts: Int,
      nFakeUsers: Int,
      nFakeProducts: Int,
  ) {
    /** Left ids of injected fake users. */
    val fakeUsers: Set[Int] = (nRealUsers until nRealUsers + nFakeUsers).toSet

    /** Right ids of injected fake products. */
    val fakeProducts: Set[Int] = (nRealProducts until nRealProducts + nFakeProducts).toSet
  }

  /** Build an attack instance. */
  def generate(
      nUsers: Int = 3000,
      nProducts: Int = 800,
      nReviews: Int = 6000,
      nFakeUsers: Int = 120,
      nFakeProducts: Int = 120,
      commentsPerFake: Int = 12,
      seed: Long = 42,
  ): Instance = {
    val rnd = new Random(seed)
    val nL = nUsers + nFakeUsers
    val nR = nProducts + nFakeProducts
    val seen = new mutable.HashSet[Long]
    val edges = mutable.ArrayBuffer.empty[(Int, Int)]
    def addEdge(v: Int, u: Int): Unit = {
      val key = v.toLong * nR + u
      if (seen.add(key)) edges += ((v, u))
    }
    // Background reviews: Zipf-popular products, Zipf-active users.
    val background = BipartiteGen.zipf(nUsers, nProducts, nReviews, 0.8, 0.8, seed + 1)
    background.edges.foreach { case (v, u) => addEdge(v, u) }
    // Fraud block + camouflage.
    for (i <- 0 until nFakeUsers) {
      val v = nUsers + i
      var placed = 0
      while (placed < commentsPerFake) { // fake comments on fake products
        val u = nProducts + rnd.nextInt(nFakeProducts)
        val before = edges.length
        addEdge(v, u)
        if (edges.length > before) placed += 1
      }
      placed = 0
      while (placed < commentsPerFake) { // camouflage comments on real products
        val u = rnd.nextInt(nProducts)
        val before = edges.length
        addEdge(v, u)
        if (edges.length > before) placed += 1
      }
    }
    Instance(BipartiteGraph.fromEdges(nL, nR, edges), nUsers, nProducts, nFakeUsers, nFakeProducts)
  }
}
