package repro.core

import repro.{SparkSpec, TestKit}
import repro.graph.DiffGraph

class DistPeelingSpec extends SparkSpec {

  test("distributed peel recovers a planted clique") {
    val clique = for (i <- 0 until 6; j <- (i + 1) until 6) yield (i, j, 2.0)
    val rnd = new scala.util.Random(1)
    val noise = for {
      i <- 6 until 60; j <- (i + 1) until 60
      if rnd.nextDouble() < 0.05
    } yield (i, j, 0.5)
    val g = repro.graph.WGraph(60, clique ++ noise)
    val r = DistPeeling.densest(DiffGraph.toDF(spark, g), eps = 0.05)
    assert((0 until 6).forall(u => r.best.contains(u.toLong)), s"got ${r.best.toSeq}")
    assert(r.density >= 10.0 - 1e-9) // clique density = 2*2*... = (k-1)*w = 10
  }

  test("distributed peel is a 2(1+eps)-approximation on positive graphs") {
    for (seed <- 1 to 5) {
      val g = TestKit.randomPositive(12, 0.4, 3.0, seed)
      val (_, opt) = TestKit.bruteDensest(g)
      val eps = 0.1
      val r = DistPeeling.densest(DiffGraph.toDF(spark, g), eps)
      assert(r.density >= opt / (2 * (1 + eps)) - 1e-9, s"seed=$seed got=${r.density} opt=$opt")
      assert(r.density <= opt + 1e-9, s"seed=$seed")
    }
  }

  test("round count is logarithmic, not linear") {
    val g = TestKit.randomPositive(300, 0.05, 2.0, 9)
    val r = DistPeeling.densest(DiffGraph.toDF(spark, g), eps = 0.2)
    assert(r.rounds.size <= 40, s"took ${r.rounds.size} rounds")
    assert(r.rounds.size >= 2)
  }

  test("density trace matches the local kernel on the surviving sets") {
    val g = TestKit.randomPositive(30, 0.3, 2.0, 11)
    val r = DistPeeling.densest(DiffGraph.toDF(spark, g), eps = 0.1)
    // best round's density must equal the local density of the returned set
    val local = g.density(r.best.map(_.toInt).toSeq)
    assert(math.abs(local - r.density) < 1e-9)
  }

  test("all-negative graph returns the trivial solution") {
    val g = repro.graph.WGraph(5, Seq((0, 1, -1.0), (2, 3, -2.0)))
    val r = DistPeeling.densest(DiffGraph.toDF(spark, g), eps = 0.1)
    assert(r.best.isEmpty)
    assert(r.density == 0.0)
  }

  test("distributed and exact peeling agree on the planted-structure optimum") {
    val clique = for (i <- 0 until 8; j <- (i + 1) until 8) yield (i, j, 3.0)
    val rnd = new scala.util.Random(5)
    val noise = for {
      i <- 8 until 100; j <- (i + 1) until 100
      if rnd.nextDouble() < 0.04
    } yield (i, j, if (rnd.nextBoolean()) 0.5 else -0.5)
    val g = repro.graph.WGraph(100, clique ++ noise)
    val exact = Peeling.greedy(g.positivePart)
    val dist = DistPeeling.densest(DiffGraph.toDF(spark, g.positivePart), eps = 0.05)
    assert(math.abs(exact.density - dist.density) < 1.0,
      s"exact=${exact.density} dist=${dist.density}")
  }
}
