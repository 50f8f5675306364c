package repro.core

import repro.graph.WGraph

import scala.collection.mutable

/** NewSEA (Algorithm 5): SEACD + Refinement driven by the smart
  * initialization heuristic of Section V-D.
  *
  * For every vertex `u`, `mu_u = tau_u * w_u / (tau_u + 1)` upper-bounds the
  * affinity of any clique in `G_{D+}` containing `u` (Thm 6 with the core
  * number `tau_u` bounding the clique size and the ego-net maximum weight
  * `w_u` bounding edge weights). Seeds are tried in descending `mu_u` order
  * and the loop stops at the first seed whose bound cannot beat the
  * incumbent — usually after a handful of initializations instead of `n`.
  */
object NewSea {

  /** Outcome of a multi-initialization DCSGA run.
    *
    * @param best       best refined (positive-clique) solution found
    * @param initsUsed  number of initializations actually run
    * @param errors     expansion errors observed across all runs
    */
  final case class MultiResult(best: AffinityResult, initsUsed: Int, errors: Int)

  /** `mu_u` for every vertex of `gDp` (which must be the positive part). */
  def smartBounds(gDp: WGraph): Array[Double] = {
    val tau = gDp.coreNumbers
    val w = gDp.egoNetMaxWeight
    Array.tabulate(gDp.n)(u => tau(u).toDouble * w(u) / (tau(u) + 1.0))
  }

  /** Runs NewSEA on `G_{D+}`. */
  def run(gDp: WGraph): MultiResult = {
    val mu = smartBounds(gDp)
    val order = (0 until gDp.n).toArray.sortBy(u => -mu(u))
    val st = new AffinityState(gDp)
    var best = AffinityResult(Array.empty, 0.0)
    var inits = 0
    var errors = 0
    var k = 0
    var done = false
    while (!done && k < order.length) {
      val u = order(k)
      if (mu(u) <= best.f) done = true
      else {
        st.initAt(u)
        val trace = Seacd.run(st)
        errors += trace.expansionErrors
        val refined = Refinement.run(st)
        inits += 1
        if (refined.f > best.f) best = refined
      }
      k += 1
    }
    MultiResult(best, inits, errors)
  }

  /** SEACD+Refine or SEA+Refine with an initialization at *every* vertex
    * (the paper's exhaustive baselines). Also returns the distinct positive
    * cliques found, with subset-cliques removed — the raw material of
    * Table V and Fig. 3.
    *
    * @param useReplicator  true for the original-SEA shrink (SEA+Refine)
    */
  def allInits(gDp: WGraph, useReplicator: Boolean): (MultiResult, Seq[AffinityResult]) = {
    val st = new AffinityState(gDp)
    var best = AffinityResult(Array.empty, 0.0)
    var errors = 0
    val cliques = mutable.LinkedHashMap.empty[Seq[Int], AffinityResult]
    var u = 0
    while (u < gDp.n) {
      st.initAt(u)
      val trace = if (useReplicator) ReplicatorSea.run(st) else Seacd.run(st)
      errors += trace.expansionErrors
      val refined = Refinement.run(st)
      if (refined.f > best.f) best = refined
      val key = refined.supportSet.toSeq
      if (key.nonEmpty && !cliques.contains(key)) cliques(key) = refined
      u += 1
    }
    (MultiResult(best, gDp.n, errors), dropSubsetCliques(cliques.values.toSeq))
  }

  /** Removes cliques whose support is a strict subset of another clique's
    * support, then sorts by descending affinity (Section VI-C
    * post-processing). Array-backed so the scan is `O(C^2)` over the `C`
    * distinct cliques.
    */
  def dropSubsetCliques(cs: Seq[AffinityResult]): Seq[AffinityResult] = {
    val arr = cs.toArray
    val sets = arr.map(_.supportSet.toSet)
    arr.indices
      .filterNot { i =>
        arr.indices.exists(j => sets(i).size < sets(j).size && sets(i).subsetOf(sets(j)))
      }
      .map(arr)
      .sortBy(-_.f)
  }
}
