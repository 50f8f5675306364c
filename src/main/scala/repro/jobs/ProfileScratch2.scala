package repro.jobs

import repro.core._

/** Scratch: which graph shapes make the loose-convergence replicator commit
  * expansion errors? (tuning tool, not a paper table)
  */
object ProfileScratch2 {
  def main(args: Array[String]): Unit = {
    def trial(name: String, g: repro.graph.WGraph): Unit = {
      val (r, _) = (NewSea.allInits(g, useReplicator = true), 0)
      println(s"$name: errors=${r._1.errors} bestF=${r._1.best.f}")
    }
    // dense near-uniform weighted blob (slow replicator mixing)
    for (p <- Seq(0.3, 0.6, 0.9); jitter <- Seq(0.1, 0.5)) {
      val rnd = new scala.util.Random(5)
      val edges = for {
        i <- 0 until 150; j <- (i + 1) until 150
        if rnd.nextDouble() < p
      } yield (i, j, 1.0 + rnd.nextDouble() * jitter)
      trial(s"blob p=$p jitter=$jitter", repro.graph.WGraph(150, edges))
    }
    // overlapping cliques with near-tied weights
    val rnd = new scala.util.Random(9)
    val cl = (for (i <- 0 until 30; j <- (i + 1) until 30) yield (i, j, 2.0 + rnd.nextDouble() * 0.01)) ++
      (for (i <- 20 until 55; j <- (i + 1) until 55) yield (i, j, 2.0 + rnd.nextDouble() * 0.01))
    trial("overlap cliques", repro.graph.WGraph(60, cl.distinct))
  }
}
