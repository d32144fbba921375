package repro.bench

import repro.SparkSpec

/** E9 — the abstract's scalability direction: the distributed iTraversal
  * produces exactly the local solution set.
  */
class B9_DistributedBench extends SparkSpec {

  test("distributed iTraversal equals local on an ER graph") {
    // Full-set equality needs a complete enumeration; MBP counts explode
    // quickly with size, so this stays at a ~10^4-solution graph.
    val table = Experiments.distributedTable(spark, nVertices = 120, density = 2, k = 1)
    val equalRow = table.rows.find(_.head == "solution sets equal").get
    assert(equalRow(1) == "true")
  }
}
