package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.graph.WGraph

class NewSeaSpec extends AnyFunSuite {

  test("mu_u is a valid upper bound for cliques through u (Thm 6)") {
    for (seed <- 1 to 15) {
      val g = TestKit.randomPositive(12, 0.5, 3.0, seed)
      val mu = NewSea.smartBounds(g)
      // enumerate all cliques; check optimal f on each clique vs each member's mu
      for (mask <- 1 until (1 << g.n)) {
        val s = (0 until g.n).filter(i => (mask & (1 << i)) != 0)
        if (s.length >= 2 && g.isPositiveClique(s)) {
          val f = TestKit.cliqueOptF(g, s)
          s.foreach(u => assert(mu(u) >= f - 1e-9, s"seed=$seed clique=$s u=$u mu=${mu(u)} f=$f"))
        }
      }
    }
  }

  test("NewSEA matches exhaustive-initialization quality on random graphs") {
    for (seed <- 1 to 15) {
      val g = TestKit.randomPositive(14, 0.4, 2.0, seed)
      val smart = NewSea.run(g)
      val (exhaustive, _) = NewSea.allInits(g, useReplicator = false)
      assert(math.abs(smart.best.f - exhaustive.best.f) < 1e-6,
        s"seed=$seed smart=${smart.best.f} exhaustive=${exhaustive.best.f}")
    }
  }

  test("NewSEA uses far fewer initializations than |V| on structured graphs") {
    // one strong clique + weak noise: the mu ordering finds it immediately
    val clique = for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j, 10.0)
    val rnd = new scala.util.Random(8)
    val noise = for {
      i <- 5 until 60; j <- (i + 1) until 60
      if rnd.nextDouble() < 0.1
    } yield (i, j, rnd.nextDouble() * 0.5)
    val g = WGraph(60, clique ++ noise)
    val r = NewSea.run(g)
    assert(r.best.supportSet.toSet == Set(0, 1, 2, 3, 4))
    assert(r.initsUsed <= 6, s"used ${r.initsUsed} inits")
  }

  test("NewSEA finds the brute-force optimum on small graphs") {
    for (seed <- 1 to 12) {
      val g = TestKit.randomPositive(11, 0.45, 2.0, seed)
      val (_, opt) = TestKit.bruteMaxAffinity(g)
      val r = NewSea.run(g)
      assert(math.abs(r.best.f - opt) < 1e-3, s"seed=$seed got=${r.best.f} opt=$opt")
    }
  }

  test("NewSEA always returns a positive clique with zero expansion errors") {
    for (seed <- 1 to 15) {
      val g = TestKit.randomPositive(13, 0.4, 2.0, seed)
      val r = NewSea.run(g)
      assert(g.isPositiveClique(r.best.supportSet.toSeq), s"seed=$seed")
      assert(r.errors == 0)
    }
  }

  test("empty graph: NewSEA returns the trivial solution") {
    val g = WGraph(4, Seq.empty)
    val r = NewSea.run(g)
    assert(r.best.f == 0.0)
  }

  test("dropSubsetCliques removes sub-cliques and sorts by f") {
    def res(s: Seq[Int], f: Double) = AffinityResult(s.map(u => (u, 1.0 / s.length)).toArray, f)
    val out = NewSea.dropSubsetCliques(Seq(
      res(Seq(1, 2), 0.5), res(Seq(1, 2, 3), 0.7), res(Seq(4, 5), 0.9), res(Seq(6), 0.0),
    ))
    assert(out.map(_.supportSet.toSeq) == Seq(Seq(4, 5), Seq(1, 2, 3), Seq(6)))
  }

  test("allInits collects the planted cliques (Table V machinery)") {
    val c1 = for (i <- 0 until 3; j <- (i + 1) until 3) yield (i, j, 4.0)
    val c2 = for (i <- 3 until 6; j <- (i + 1) until 6) yield (i, j, 2.0)
    val g = WGraph(8, c1 ++ c2 :+ (6, 7, 1.0))
    val (best, cliques) = NewSea.allInits(g, useReplicator = false)
    assert(math.abs(best.best.f - 8.0 / 3) < 1e-4)
    val sets = cliques.map(_.supportSet.toSet)
    assert(sets.contains(Set(0, 1, 2)))
    assert(sets.contains(Set(3, 4, 5)))
    assert(sets.contains(Set(6, 7)))
    // sorted by descending affinity
    assert(cliques.map(-_.f) == cliques.map(-_.f).sorted)
  }
}
