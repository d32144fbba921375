package repro.gen

import repro.SparkSpec

class FraudGenSpec extends SparkSpec {

  private lazy val inst = FraudGen.generate(
    nUsers = 500, nProducts = 200, nReviews = 1500,
    nFakeUsers = 40, nFakeProducts = 40, commentsPerFake = 8, seed = 1)

  test("vertex universe includes the injected block at the tail ids") {
    assert(inst.graph.nL == 540 && inst.graph.nR == 240)
    assert(inst.fakeUsers == (500 until 540).toSet)
    assert(inst.fakeProducts == (200 until 240).toSet)
  }

  test("every fake user has the configured fake and camouflage degree") {
    for (v <- inst.fakeUsers) {
      val fake = inst.graph.adjL(v).count(_ >= 200)
      val camo = inst.graph.adjL(v).count(_ < 200)
      assert(fake == 8, s"user $v has $fake fake comments")
      assert(camo == 8, s"user $v has $camo camouflage comments")
    }
  }

  test("real users never touch fake products") {
    for (v <- 0 until 500) {
      assert(inst.graph.adjL(v).forall(_ < 200), s"real user $v reviews a fake product")
    }
  }

  test("block density well above background density") {
    val blockEdges = inst.fakeUsers.toSeq.map(v => inst.graph.adjL(v).count(_ >= 200)).sum
    val blockDensity = blockEdges.toDouble / (40 * 40)
    val bgEdges = (0 until 500).map(v => inst.graph.adjL(v).length).sum
    val bgDensity = bgEdges.toDouble / (500 * 200)
    assert(blockDensity > 10 * bgDensity, s"block $blockDensity vs background $bgDensity")
  }

  test("generation is deterministic") {
    val a = FraudGen.generate(seed = 9)
    val b = FraudGen.generate(seed = 9)
    assert(a.graph.edges.toSeq == b.graph.edges.toSeq)
  }
}
