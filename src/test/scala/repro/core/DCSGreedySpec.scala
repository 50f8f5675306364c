package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.graph.WGraph

class DCSGreedySpec extends AnyFunSuite {

  test("no positive edges: single vertex, density 0, ratio 1") {
    val g = WGraph(3, Seq((0, 1, -2.0), (1, 2, -3.0)))
    val r = DCSGreedy.run(g)
    assert(r.s.length == 1)
    assert(r.density == 0.0)
    assert(r.ratio == 1.0)
  }

  test("single positive edge graph") {
    val g = WGraph(4, Seq((0, 1, 5.0), (2, 3, -1.0)))
    val r = DCSGreedy.run(g)
    assert(r.s.toSet == Set(0, 1))
    assert(r.density == 5.0)
  }

  test("returned subgraph is connected in G_D (Property 1)") {
    for (seed <- 1 to 25) {
      val g = TestKit.randomSigned(14, 0.3, 3.0, seed)
      val r = DCSGreedy.run(g)
      assert(g.componentsOf(r.s.toSeq).size == 1, s"seed=$seed S=${r.s.toSeq}")
    }
  }

  test("density reported matches the returned set and ratio >= 1") {
    for (seed <- 1 to 25) {
      val g = TestKit.randomSigned(14, 0.4, 3.0, seed)
      val r = DCSGreedy.run(g)
      if (r.density > 0) {
        assert(math.abs(g.density(r.s.toSeq) - r.density) < 1e-9, s"seed=$seed")
        assert(r.ratio >= 1.0 - 1e-9, s"seed=$seed ratio=${r.ratio}")
      }
    }
  }

  test("data-dependent ratio bounds the true optimum (Thm 2)") {
    for (seed <- 1 to 25) {
      val g = TestKit.randomSigned(13, 0.4, 3.0, seed)
      val r = DCSGreedy.run(g)
      val (_, opt) = TestKit.bruteDensest(g)
      if (opt > 0) {
        assert(r.density * r.ratio >= opt - 1e-9, s"seed=$seed claim=${r.density * r.ratio} opt=$opt")
        assert(r.density <= opt + 1e-9)
      }
    }
  }

  test("heaviest-edge candidate rescues adversarial instances") {
    // dense mildly-positive blob vs one very heavy isolated edge
    val blob = for (i <- 0 until 8; j <- (i + 1) until 8) yield (i, j, 0.1)
    val g = WGraph(10, blob :+ (8, 9, 100.0))
    val r = DCSGreedy.run(g)
    assert(r.s.toSet == Set(8, 9))
    assert(r.density == 100.0)
  }

  test("planted contrast clique is recovered exactly") {
    // 5-clique of weight 4 (rho = 16) inside noise of weight +-1
    val clique = for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j, 4.0)
    val rnd = new scala.util.Random(3)
    val noise = for {
      i <- 0 until 30; j <- (i + 1) until 30
      if !(i < 5 && j < 5) && rnd.nextDouble() < 0.1
    } yield (i, j, if (rnd.nextBoolean()) 1.0 else -1.0)
    val g = WGraph(30, clique ++ noise)
    val r = DCSGreedy.run(g)
    assert(r.s.toSet == Set(0, 1, 2, 3, 4), s"got ${r.s.toSeq}")
    assert(math.abs(r.density - 16.0) < 1e-9)
  }

  test("the disconnected-winner case picks its densest component") {
    // graph engineered so Greedy(G_D+) returns two components
    val g = WGraph(6, Seq((0, 1, 6.0), (2, 3, 6.0), (3, 4, 6.0), (2, 4, 6.0), (0, 5, -1.0)))
    val r = DCSGreedy.run(g)
    assert(g.componentsOf(r.s.toSeq).size == 1)
    assert(r.s.toSet == Set(2, 3, 4)) // triangle rho = 12 beats edge rho = 6
  }
}
