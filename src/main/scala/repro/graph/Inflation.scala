package repro.graph

/** Graph inflation (Section 1 / baselines).
  *
  * A bipartite graph `G = (L ∪ R, E)` is inflated into a general graph by
  * adding an edge between every pair of same-side vertices. A k-biplex of
  * `G` then corresponds to a (k+1)-plex of the inflated graph and vice
  * versa, which is how the FaPlexen baseline and the Inflation variant of
  * EnumAlmostSat operate.
  *
  * Vertex mapping: left vertex v ↦ v, right vertex u ↦ nL + u.
  */
object Inflation {

  /** Inflate the full bipartite graph. */
  def inflate(g: BipartiteGraph): GeneralGraph = inflateSub(g, (0 until g.nL).toArray, (0 until g.nR).toArray)._1

  /** Inflate the induced subgraph on (ls, rs) (sorted original ids).
    *
    * Returns the general graph over compacted ids plus the original-id
    * lookup array: new id i < ls.length maps to left `ls(i)`, otherwise to
    * right `rs(i - ls.length)`.
    */
  def inflateSub(g: BipartiteGraph, ls: Array[Int], rs: Array[Int]): (GeneralGraph, Array[Int]) = {
    val nl = ls.length
    val n = nl + rs.length
    val adj = new Array[Array[Int]](n)
    // Left vertex i: clique over other lefts + its right neighbours in rs.
    var i = 0
    while (i < nl) {
      val nb = VertexSets.intersect(g.adjL(ls(i)), rs)
      val out = new Array[Int](nl - 1 + nb.length)
      var p = 0
      var j = 0
      while (j < nl) { if (j != i) { out(p) = j; p += 1 }; j += 1 }
      var q = 0
      while (q < nb.length) {
        out(p) = nl + java.util.Arrays.binarySearch(rs, nb(q)); p += 1; q += 1
      }
      adj(i) = out // ascending: lefts 0..nl-1 then rights nl..n-1
      i += 1
    }
    // Right vertex nl + j: its left neighbours in ls + clique over rights.
    var j = 0
    while (j < rs.length) {
      val nb = VertexSets.intersect(g.adjR(rs(j)), ls)
      val out = new Array[Int](nb.length + rs.length - 1)
      var p = 0
      var q = 0
      while (q < nb.length) {
        out(p) = java.util.Arrays.binarySearch(ls, nb(q)); p += 1; q += 1
      }
      var r = 0
      while (r < rs.length) { if (r != j) { out(p) = nl + r; p += 1 }; r += 1 }
      adj(nl + j) = out
      j += 1
    }
    val back = ls ++ rs
    (new GeneralGraph(n, adj), back)
  }
}
