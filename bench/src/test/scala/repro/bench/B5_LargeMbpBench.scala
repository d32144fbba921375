package repro.bench

import repro.SparkSpec

/** E5 — Figure 10: enumerating large MBPs vs theta (paper: runtime falls
  * as theta grows; iTraversal beats iMB by up to 4 orders of magnitude).
  */
class B5_LargeMbpBench extends SparkSpec {

  test("Fig 10: writer and dblp, theta = 3..7, k=1") {
    val table = Experiments.largeMbpTable(Seq("writer", "dblp"), 3 to 7, k = 1)
    assert(table.rows.size == 10)
    // Where both algorithms completed, they found the same number of MBPs.
    table.rows.foreach { row =>
      val (t1, t2, n1, n2) = (row(2), row(3), row(4), row(5))
      if (t1 != "INF" && t2 != "INF")
        assert(n1 == n2, s"${row(0)} theta=${row(1)}: iTraversal found $n1, iMB found $n2")
    }
    // iTraversal completes on every setting.
    table.rows.foreach(row => assert(row(2) != "INF", s"iTraversal INF at ${row.take(2)}"))
  }
}
