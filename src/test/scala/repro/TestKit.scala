package repro

import repro.graph.WGraph

import scala.util.Random

/** Shared test helpers: small-graph constructors and brute-force oracles for
  * both DCS objectives (usable up to ~n = 15).
  */
object TestKit {

  /** Exhaustive densest subset: `max over nonempty S of W(S)/|S|` (paper
    * convention: both orientations counted).
    */
  def bruteDensest(g: WGraph): (Set[Int], Double) = {
    require(g.n <= 20, "exhaustive search only for tiny graphs")
    var best = Set.empty[Int]
    var bestRho = Double.NegativeInfinity
    for (mask <- 1 until (1 << g.n)) {
      val s = (0 until g.n).filter(i => (mask & (1 << i)) != 0)
      val rho = g.density(s)
      if (rho > bestRho) { bestRho = rho; best = s.toSet }
    }
    (best, bestRho)
  }

  /** Solves the dense linear system `A x = b` by Gaussian elimination with
    * partial pivoting; returns None if (near-)singular.
    */
  def solve(a: Array[Array[Double]], b: Array[Double]): Option[Array[Double]] = {
    val n = b.length
    val m = Array.tabulate(n, n + 1)((i, j) => if (j < n) a(i)(j) else b(i))
    for (col <- 0 until n) {
      val piv = (col until n).maxBy(r => math.abs(m(r)(col)))
      if (math.abs(m(piv)(col)) < 1e-12) return None
      val tmp = m(col); m(col) = m(piv); m(piv) = tmp
      for (r <- 0 until n if r != col) {
        val factor = m(r)(col) / m(col)(col)
        for (c <- col to n) m(r)(c) -= factor * m(col)(c)
      }
    }
    Some(Array.tabulate(n)(i => m(i)(n) / m(i)(i)))
  }

  /** Brute-force DCSGA optimum: by Thm 5 an optimal embedding is supported on
    * a positive clique, and on a clique the interior KKT point solves
    * `D_S x = lambda 1, sum x = 1` (boundary optima are covered by
    * enumerating sub-cliques). Returns `(support, f)`.
    */
  def bruteMaxAffinity(g: WGraph): (Set[Int], Double) = {
    require(g.n <= 18, "exhaustive search only for tiny graphs")
    var best = Set.empty[Int]
    var bestF = 0.0
    for (mask <- 1 until (1 << g.n)) {
      val s = (0 until g.n).filter(i => (mask & (1 << i)) != 0)
      if (g.isPositiveClique(s)) {
        val f = cliqueOptF(g, s)
        if (f > bestF) { bestF = f; best = s.toSet }
      }
    }
    (best, bestF)
  }

  /** Optimal `x^T D x` over embeddings supported on clique `s`, considering
    * the interior stationary point (if feasible) and the uniform point.
    * Sub-clique boundary optima are the caller's responsibility.
    */
  def cliqueOptF(g: WGraph, s: Seq[Int]): Double = {
    val k = s.length
    if (k == 1) return 0.0
    val d = Array.tabulate(k, k)((i, j) => g.weight(s(i), s(j)))
    // stationarity with multiplier: D x = (lambda/2) 1; scale-invariant, so
    // solve D y = 1 and normalize
    val interior = solve(d, Array.fill(k)(1.0)).flatMap { y =>
      val sum = y.sum
      if (sum <= 0 || y.exists(_ < -1e-9)) None
      else {
        val x = y.map(_ / sum)
        var f = 0.0
        for (i <- 0 until k; j <- 0 until k) f += x(i) * x(j) * d(i)(j)
        Some(f)
      }
    }
    val uniform = {
      var f = 0.0
      for (i <- 0 until k; j <- 0 until k) f += d(i)(j) / (k.toDouble * k)
      f
    }
    math.max(interior.getOrElse(0.0), uniform)
  }

  /** Evaluates `f_D(x) = x^T D x` directly from an embedding. */
  def evalF(g: WGraph, x: Map[Int, Double]): Double = {
    var f = 0.0
    for ((u, xu) <- x; (v, xv) <- x) f += xu * xv * g.weight(u, v)
    f
  }

  /** Random signed graph: each pair present w.p. `p`, weight U(-range, range). */
  def randomSigned(n: Int, p: Double, range: Double, seed: Long): WGraph = {
    val rnd = new Random(seed)
    val edges = for {
      i <- 0 until n
      j <- (i + 1) until n
      if rnd.nextDouble() < p
    } yield (i, j, (rnd.nextDouble() * 2 - 1) * range)
    WGraph(n, edges)
  }

  /** Random positive-weight graph. */
  def randomPositive(n: Int, p: Double, range: Double, seed: Long): WGraph = {
    val rnd = new Random(seed)
    val edges = for {
      i <- 0 until n
      j <- (i + 1) until n
      if rnd.nextDouble() < p
    } yield (i, j, rnd.nextDouble() * range + 1e-3)
    WGraph(n, edges)
  }

  /** KKT violation of `x` on graph `g` (Eq. 8): `max_{x_k<1} grad_k - min_{x_k>0} grad_k`,
    * clamped at 0. Near 0 means `x` is a KKT point.
    */
  def kktViolation(g: WGraph, x: Map[Int, Double]): Double = {
    val dx = Array.fill(g.n)(0.0)
    for ((u, xu) <- x) g.foreachNbr(u)((v, w) => dx(v) += w * xu)
    val maxFree = (0 until g.n).filter(u => x.getOrElse(u, 0.0) < 1.0).map(dx).maxOption.getOrElse(0.0)
    val minSup = x.collect { case (u, xu) if xu > 0 => dx(u) }.minOption.getOrElse(0.0)
    math.max(0.0, 2.0 * (maxFree - minSup))
  }
}
