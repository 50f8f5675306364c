package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.graph.WGraph

class EgoScanSpec extends AnyFunSuite {

  test("reported total weight matches the returned set (paper convention)") {
    for (seed <- 1 to 15) {
      val g = TestKit.randomSigned(15, 0.4, 3.0, seed)
      val r = EgoScan.run(g)
      assert(math.abs(g.inducedWeight(r.s.toSeq) - r.totalWeight) < 1e-9, s"seed=$seed")
    }
  }

  test("result is a local optimum of W_D(S): no single add/remove improves") {
    for (seed <- 1 to 15) {
      val g = TestKit.randomSigned(12, 0.5, 2.0, seed)
      val r = EgoScan.run(g)
      val s = r.s.toSet
      if (s.nonEmpty) {
        for (u <- 0 until g.n) {
          var marginal = 0.0
          g.foreachNbr(u)((v, w) => if (s(v) && v != u) marginal += w)
          if (s(u)) assert(marginal >= -1e-9, s"seed=$seed removing $u improves")
          else assert(marginal <= 1e-9, s"seed=$seed adding $u improves")
        }
      }
    }
  }

  test("finds the full positive region when no negatives interfere") {
    val g = WGraph(6, Seq((0, 1, 2.0), (1, 2, 3.0), (2, 3, 1.0), (4, 5, -1.0)))
    val r = EgoScan.run(g)
    assert(r.s.toSet == Set(0, 1, 2, 3))
    assert(r.totalWeight == 12.0)
  }

  test("prefers total weight over density: takes a large blob over a heavy edge") {
    // blob: 8 vertices, all pairs weight 1 (W = 56 ordered); heavy edge W = 40
    val blob = for (i <- 0 until 8; j <- (i + 1) until 8) yield (i, j, 1.0)
    val g = WGraph(10, blob :+ (8, 9, 20.0))
    val r = EgoScan.run(g)
    assert(r.s.toSet == (0 until 8).toSet)
    assert(r.totalWeight == 56.0)
  }

  test("excludes vertices with net-negative attachment") {
    val g = WGraph(4, Seq((0, 1, 5.0), (1, 2, 2.0), (0, 2, -4.0), (2, 3, 1.0)))
    // vertex 2's marginal to {0,1} = -2; adding 3 doesn't save it (-1)
    val r = EgoScan.run(g)
    assert(r.s.toSet == Set(0, 1))
    assert(r.totalWeight == 10.0)
  }

  test("exhaustive check on tiny graphs: local search is near the global W optimum") {
    for (seed <- 1 to 15) {
      val g = TestKit.randomSigned(10, 0.5, 2.0, seed)
      var opt = 0.0
      for (mask <- 1 until (1 << g.n)) {
        val s = (0 until g.n).filter(i => (mask & (1 << i)) != 0)
        opt = math.max(opt, g.inducedWeight(s))
      }
      val r = EgoScan.run(g)
      assert(r.totalWeight >= 0.6 * opt - 1e-9, s"seed=$seed got=${r.totalWeight} opt=$opt")
      assert(r.totalWeight <= opt + 1e-9)
    }
  }
}
