package repro.jobs

import repro.bench.Harness
import repro.core._
import repro.gen.BipartiteGen

/** Scratch profiling entrypoint (not part of the evaluation tables). */
object Profile {
  def main(args: Array[String]): Unit = {
    val scaled = TraversalConfig.iTraversal.copy(twoHopSeeds = true)
    for (nv <- Seq(10000, 100000, 1000000)) {
      val (g, genMs) = Harness.timed(BipartiteGen.er(nv / 2, nv / 2, nv.toLong * 10, seed = 7))
      val dl = Harness.deadline(30000)
      var c = 0L
      val (stats, ms) = Harness.timed(
        ReverseSearch.run(g, 1, scaled, _ => { c += 1; c < 1000 }, dl))
      System.err.println(s"n=$nv gen=${genMs}ms found=$c links=${stats.links} eas=${stats.easCalls} ms=$ms aborted=${stats.aborted}")
    }
  }
}
