package repro.props

import org.scalacheck.{Gen, Prop, Properties}
import repro.TestKit
import repro.core._

/** Randomized invariants of the DCSGA machinery. */
object AffinityProps extends Properties("DCSGA") {

  private val genPositive = for {
    n <- Gen.choose(3, 14)
    p <- Gen.choose(0.2, 0.7)
    seed <- Gen.choose(0L, 100000L)
  } yield TestKit.randomPositive(n, p, 2.0, seed)

  private val genSigned = for {
    n <- Gen.choose(3, 14)
    p <- Gen.choose(0.2, 0.7)
    seed <- Gen.choose(0L, 100000L)
  } yield TestKit.randomSigned(n, p, 2.0, seed)

  property("descent preserves the simplex and never decreases f") =
    Prop.forAll(genSigned, Gen.choose(0L, 9999L)) { (g, s) =>
      val st = new AffinityState(g)
      val rnd = new scala.util.Random(s)
      val raw = Array.fill(g.n)(rnd.nextDouble() + 1e-6)
      val sum = raw.sum
      (0 until g.n).foreach(u => st.setX(u, raw(u) / sum))
      val f0 = st.f
      CoordinateDescent.descend(st, (0 until g.n).toArray, 1e-9)
      st.f >= f0 - 1e-9 && math.abs(st.mass - 1.0) < 1e-6
    }

  property("SEACD + Refinement yields a positive clique with f >= 0") =
    Prop.forAll(genPositive, Gen.choose(0, 13)) { (g, seed) =>
      val st = new AffinityState(g)
      st.initAt(seed % g.n)
      Seacd.run(st)
      val r = Refinement.run(st)
      g.isPositiveClique(r.supportSet.toSeq) && r.f >= -1e-12
    }

  property("refined f never exceeds the brute-force optimum") =
    Prop.forAll(genPositive) { g =>
      val (_, opt) = TestKit.bruteMaxAffinity(g)
      val st = new AffinityState(g)
      var best = 0.0
      for (u <- 0 until g.n) {
        st.initAt(u)
        Seacd.run(st)
        best = math.max(best, Refinement.run(st).f)
      }
      best <= opt + 1e-3
    }

  property("NewSEA smart bound prunes without losing quality") =
    Prop.forAll(genPositive) { g =>
      val smart = NewSea.run(g)
      val (all, _) = NewSea.allInits(g, useReplicator = false)
      math.abs(smart.best.f - all.best.f) < 1e-6 && smart.initsUsed <= g.n
    }

  property("result embedding weights sum to ~1 with positive entries") =
    Prop.forAll(genPositive, Gen.choose(0, 13)) { (g, seed) =>
      val st = new AffinityState(g)
      st.initAt(seed % g.n)
      Seacd.run(st)
      val r = st.result
      math.abs(r.embedding.map(_._2).sum - 1.0) < 1e-6 && r.embedding.forall(_._2 > 0)
    }

  property("expansion never fires at a strict global KKT point") =
    Prop.forAll(genPositive, Gen.choose(0, 13)) { (g, seed) =>
      val st = new AffinityState(g)
      st.initAt(seed % g.n)
      Seacd.run(st)
      Expansion.candidates(st, math.max(1e-9, st.f * 1e-9)).isEmpty
    }
}
