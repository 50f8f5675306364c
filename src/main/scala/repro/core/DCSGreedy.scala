package repro.core

import repro.graph.WGraph

/** Result of DCSGreedy (Algorithm 2).
  *
  * @param s        the chosen vertex set
  * @param density  `rho_D(S) = W_D(S)/|S|` in the difference graph
  * @param ratio    the data-dependent approximation ratio
  *                 `2 * rho_{D+}(S2) / rho_D(S)` (Thm 2); `1.0` when `G_D`
  *                 has no positive edge (the trivial single vertex is optimal)
  */
final case class DCSResult(s: Array[Int], density: Double, ratio: Double)

/** DCSGreedy (Algorithm 2): the `O(n)`-approximation for DCS w.r.t. average
  * degree on a difference graph with signed edge weights.
  *
  * Candidates: the heaviest positive edge `{u, v}` (an `1/(n-1)`-optimal
  * solution), `Greedy(G_D)` and `Greedy(G_{D+})`; all three are evaluated by
  * their density in `G_D` and the winner is refined to its best connected
  * component of `G_D(S)` (Property 1).
  */
object DCSGreedy {

  def run(gD: WGraph): DCSResult = {
    // locate the heaviest edge and check for any positive weight
    var bu = -1; var bv = -1; var bw = Double.NegativeInfinity
    var u = 0
    while (u < gD.n) {
      gD.foreachNbr(u) { (v, w) => if (v > u && w > bw) { bu = u; bv = v; bw = w } }
      u += 1
    }
    if (bu == -1 || bw <= 0.0) {
      // no positive-weight edge: any single vertex is optimal (density 0)
      return DCSResult(if (gD.n > 0) Array(0) else Array.empty, 0.0, 1.0)
    }

    val gDp = gD.positivePart
    val maxEdge = Array(bu, bv)
    val s1 = Peeling.greedy(gD).best
    val s2 = Peeling.greedy(gDp).best

    // line 7: all candidates scored by density in G_D
    var s = maxEdge
    var rho = gD.density(maxEdge)
    for (cand <- Seq(s1, s2)) {
      val r = gD.density(cand)
      if (r > rho) { rho = r; s = cand }
    }

    // lines 8-9: keep the densest connected component of G_D(S)
    val comps = gD.componentsOf(s)
    if (comps.size > 1) {
      var bestComp = comps.head
      var bestRho = gD.density(bestComp)
      for (c <- comps.tail) {
        val r = gD.density(c)
        if (r > bestRho) { bestRho = r; bestComp = c }
      }
      s = bestComp
      rho = bestRho
    }

    val ratio = 2.0 * gDp.density(s2) / rho
    DCSResult(s.sorted, rho, ratio)
  }
}
