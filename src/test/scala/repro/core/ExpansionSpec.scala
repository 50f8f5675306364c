package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.graph.WGraph

class ExpansionSpec extends AnyFunSuite {

  test("candidates are exactly the off-support vertices with (Dx)_v > f") {
    val g = WGraph(4, Seq((0, 1, 2.0), (1, 2, 3.0), (0, 3, 0.5)))
    val st = new AffinityState(g)
    st.setX(0, 0.5); st.setX(1, 0.5)
    CoordinateDescent.descend(st, Array(0, 1), 1e-9)
    val f = st.f // = 1.0 at x = (.5, .5)
    // (Dx)_2 = 3 * 0.5 = 1.5 > 1 ; (Dx)_3 = 0.5 * 0.5 = 0.25 < 1
    val z = Expansion.candidates(st, 1e-9)
    assert(z.toSet == Set(2))
    assert(math.abs(f - 1.0) < 1e-6)
  }

  test("expansion from a local KKT point increases f (sign-corrected step)") {
    for (seed <- 1 to 20) {
      val g = TestKit.randomPositive(12, 0.5, 2.0, seed)
      val st = new AffinityState(g)
      st.initAt(seed % 12)
      // shrink on the seed alone, then expand once
      CoordinateDescent.descend(st, st.support, 1e-9)
      val z = Expansion.candidates(st, 1e-9)
      if (z.nonEmpty) {
        val before = st.f
        val after = Expansion.expand(st, z)
        assert(after >= before - 1e-9, s"seed=$seed before=$before after=$after")
        assert(math.abs(st.mass - 1.0) < 1e-9)
      }
    }
  }

  test("expansion result matches direct objective evaluation") {
    for (seed <- 1 to 10) {
      val g = TestKit.randomPositive(10, 0.6, 2.0, seed)
      val st = new AffinityState(g)
      st.initAt(0)
      CoordinateDescent.descend(st, st.support, 1e-9)
      val z = Expansion.candidates(st, 1e-9)
      if (z.nonEmpty) {
        val after = Expansion.expand(st, z)
        val x = st.support.map(u => u -> st.x(u)).toMap
        assert(math.abs(after - TestKit.evalF(g, x)) < 1e-9, s"seed=$seed")
      }
    }
  }

  test("no candidates at a global KKT point") {
    val g = WGraph(3, Seq((0, 1, 2.0), (1, 2, 2.0), (0, 2, 2.0)))
    val st = new AffinityState(g)
    Seq(0, 1, 2).foreach(u => st.setX(u, 1.0 / 3))
    CoordinateDescent.descend(st, Array(0, 1, 2), 1e-12)
    assert(Expansion.candidates(st, 1e-9).isEmpty)
  }

  test("expand with empty Z is a no-op") {
    val g = WGraph(2, Seq((0, 1, 1.0)))
    val st = new AffinityState(g)
    st.setX(0, 0.5); st.setX(1, 0.5)
    val f0 = st.f
    assert(Expansion.expand(st, Array.empty) == f0)
  }
}
