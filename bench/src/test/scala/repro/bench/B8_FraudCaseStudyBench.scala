package repro.bench

import repro.SparkSpec

/** E8 — Figure 13: fraud detection under a random camouflage attack
  * (paper: k-biplex best F1; biclique high precision / collapsing recall
  * as thetaR grows; (α,β)-core high recall / low precision).
  */
class B8_FraudCaseStudyBench extends SparkSpec {

  test("Fig 13: precision / recall / F1 across structures, thetaL=4") {
    val table = Experiments.fraudTable(thetaL = 4, thetaRs = 3 to 7)
    assert(table.rows.nonEmpty)
    def f1s(method: String): Seq[Double] =
      table.rows.filter(_.head == method).map(_.last).filter(_ != "ND").map(_.toDouble)
    val biplexBest = (f1s("1-biplex") ++ f1s("2-biplex")).maxOption.getOrElse(0.0)
    val coreBest = f1s("ab-core").maxOption.getOrElse(0.0)
    // The paper's headline qualitative claim.
    assert(biplexBest > coreBest, s"k-biplex best F1 $biplexBest <= core best F1 $coreBest")
  }
}
