package repro.core

import repro.graph.WGraph

import scala.collection.mutable

/** Result of a greedy peel: the best prefix found and its average degree. */
final case class PeelResult(best: Array[Int], density: Double)

/** Charikar's greedy peeling (Algorithm 1 of the paper), generalized to
  * graphs with negative edge weights.
  *
  * Starting from `S1 = V`, repeatedly removes the vertex with the minimum
  * current weighted degree `W(j; G(S1))` and keeps the prefix with the largest
  * average degree `W(S1)/|S1|`. A lazy binary heap stands in for the paper's
  * segment tree; both give `O((m + n) log n)`.
  *
  * On positive-weight graphs this is the classic 2-approximation of densest
  * subgraph [Charikar 2000]; on difference graphs it is one of the candidate
  * generators inside DCSGreedy (no ratio guarantee — Cor 1).
  */
object Peeling {

  def greedy(g: WGraph): PeelResult = {
    val n = g.n
    if (n == 0) return PeelResult(Array.empty, 0.0)
    val deg = Array.tabulate(n)(g.weightedDegree)
    val removed = new Array[Boolean](n)
    // lazy min-heap of (degree-at-push, vertex)
    val heap = mutable.PriorityQueue.empty[(Double, Int)](Ordering.by[(Double, Int), Double](_._1).reverse)
    var u = 0
    while (u < n) { heap.enqueue((deg(u), u)); u += 1 }

    var totalW = g.totalWeight
    var size = n
    var bestDensity = totalW / size
    var bestSize = size
    val order = new Array[Int](n) // removal order
    var step = 0

    while (size > 1) {
      var v = -1
      while (v == -1) {
        val (d, cand) = heap.dequeue()
        if (!removed(cand) && d == deg(cand)) v = cand
      }
      removed(v) = true
      totalW -= 2.0 * deg(v) // W counts both orientations; v's row and column vanish
      size -= 1
      g.foreachNbr(v) { (w, wt) =>
        if (!removed(w)) { deg(w) -= wt; heap.enqueue((deg(w), w)) }
      }
      order(step) = v
      step += 1
      val rho = totalW / size
      if (rho > bestDensity) { bestDensity = rho; bestSize = size }
    }

    // best prefix = all vertices not among the first (n - bestSize) removals
    val gone = new Array[Boolean](n)
    var i = 0
    while (i < n - bestSize) { gone(order(i)) = true; i += 1 }
    val best = (0 until n).filter(!gone(_)).toArray
    PeelResult(best, bestDensity)
  }
}
