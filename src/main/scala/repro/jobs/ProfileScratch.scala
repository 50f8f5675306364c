package repro.jobs

import repro.core._
import repro.graph.DiffGraph

/** Scratch profiler for the DCSGA all-initializations path (not a paper
  * table; used to tune the bench sizes).
  */
object ProfileScratch {
  def main(args: Array[String]): Unit = {
    val spark = JobContext.spark("profile")
    val dblp = repro.data.SynthGraphs.dblp(spark, 4500, 26000)
    val diff = DiffGraph.difference(dblp.g1, dblp.g2)
    val disc = DiffGraph.toWGraph(DiffGraph.discretize(diff), dblp.n).positivePart
    println(s"discrete positive part: n=${disc.n} m=${disc.numEdges}")
    def time[T](label: String)(body: => T): T = {
      val t0 = System.nanoTime()
      val r = body
      println(f"$label: ${(System.nanoTime() - t0) / 1e6}%.0fms")
      r
    }
    time("manual loop") {
      val st = new AffinityState(disc)
      for (u <- 0 until disc.n) { st.initAt(u); Seacd.run(st); Refinement.run(st) }
    }
    val (_, cliques) = time("allInits cd") { NewSea.allInits(disc, useReplicator = false) }
    println(s"distinct cliques: ${cliques.size}")
    time("allInits replicator") { NewSea.allInits(disc, useReplicator = true) }
    val weighted = DiffGraph.toWGraph(diff, dblp.n).positivePart
    time("weighted allInits cd") { NewSea.allInits(weighted, useReplicator = false) }
  }
}
