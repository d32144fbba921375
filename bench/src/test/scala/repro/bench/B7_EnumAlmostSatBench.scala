package repro.bench

import repro.SparkSpec

/** E7 — Figure 12: the five EnumAlmostSat implementations on random
  * almost-satisfying graphs (paper: L2.0+R2.0 fastest, up to 1000x over
  * Inflation; all grow with k).
  */
class B7_EnumAlmostSatBench extends SparkSpec {

  test("Fig 12: writer, k = 1..2, 300 almost-satisfying graphs") {
    val table = Experiments.enumAlmostSatTable("writer", 1 to 2, count = 300)
    assert(table.rows.size == 2)
    // The L2.0+R2.0 column (4th variant) produced a number for every k.
    table.rows.foreach { row =>
      assert(row(4) != "INF", s"L20R20 hit the budget at ${row.head}")
    }
  }

  test("Fig 12: dblp, k = 1, 200 almost-satisfying graphs") {
    val table = Experiments.enumAlmostSatTable("dblp", Seq(1), count = 200)
    assert(table.rows.size == 1)
  }
}
