package repro.bench

import repro.SparkSpec
import repro.gen.BipartiteGen

/** E3 — Figure 8: maximum delay over a full enumeration on small datasets
  * (paper: iTraversal has the smallest delay — polynomial vs the
  * exponential-delay baselines; all delays grow with k).
  */
class B3_DelayBench extends SparkSpec {

  private lazy val datasets = Seq(
    "divorce" -> BipartiteGen.dataset("divorce").build(),
    "cfat-s"  -> BipartiteGen.zipf(40, 40, 160, 1.0, 1.0, seed = 112),
  )

  test("Fig 8: delay on divorce and cfat-s, k = 1..2") {
    val table = Experiments.delayTable(datasets, 1 to 2)
    assert(table.rows.nonEmpty)
    // iTraversal (last column) completes the full enumeration on divorce k=1.
    val row = table.rows.find(r => r.head == "divorce" && r(1) == "1").get
    assert(row.last != "INF", "iTraversal hit INF on divorce k=1")
  }
}
