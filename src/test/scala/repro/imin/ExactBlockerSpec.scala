package repro.imin

import repro.SparkSpec
import repro.graph.{ProbGraph, ToyGraph}
import repro.spread.ExactSpread

class ExactBlockerSpec extends SparkSpec {

  private val g = ToyGraph.graph
  private val seeds = Set(ToyGraph.seed)
  private def v(k: Int) = ToyGraph.v(k)

  test("choose computes binomial coefficients") {
    assert(ExactBlocker.choose(5, 0) == 1L)
    assert(ExactBlocker.choose(5, 1) == 5L)
    assert(ExactBlocker.choose(5, 2) == 10L)
    assert(ExactBlocker.choose(5, 5) == 1L)
    assert(ExactBlocker.choose(25, 4) == 12650L)
    assert(ExactBlocker.choose(3, 4) == 0L)
  }

  test("unrank enumerates every b-subset exactly once") {
    for (k <- Seq(5, 7); b <- 1 to 3) {
      val total = ExactBlocker.choose(k, b)
      val subsets = (0L until total).map(i => ExactBlocker.unrank(i, b).toSet)
      assert(subsets.distinct.size == total)
      assert(subsets.forall(s => s.size == b && s.forall(x => x >= 0 && x < k)))
    }
  }

  test("unrank positions are strictly increasing") {
    for (i <- 0L until ExactBlocker.choose(6, 3)) {
      val pos = ExactBlocker.unrank(i, 3)
      assert(pos.sliding(2).forall(w => w(0) < w(1)), s"idx=$i -> ${pos.toSeq}")
    }
  }

  test("Exact finds v5 at b=1 on the toy graph") {
    val (blockers, spread) = ExactBlocker.run(spark, g, seeds, 1, 4000, 1L, distributed = false)
    assert(blockers == Seq(v(5)))
    assert(math.abs(spread - 3.0) < 0.1)
  }

  test("Exact finds {v2, v4} at b=2 on the toy graph") {
    val (blockers, spread) = ExactBlocker.run(spark, g, seeds, 2, 4000, 2L, distributed = false)
    assert(blockers.toSet == Set(v(2), v(4)))
    assert(math.abs(spread - 1.0) < 1e-9)
  }

  test("Exact spread is a lower bound for every heuristic (common worlds)") {
    val thetaEval = 2000
    val evalSeed = 3L
    val (_, exSpread) = ExactBlocker.run(spark, g, seeds, 1, thetaEval, evalSeed, distributed = false)
    for (u <- 0 until g.n if u != ToyGraph.seed) {
      val s = repro.spread.MonteCarloSpread.spreadLocal(
        g, Array(ToyGraph.seed), thetaEval, evalSeed, Blocking.maskOf(g.n, Seq(u)))
      assert(exSpread <= s + 1e-9, s"u=v${u + 1}")
    }
  }

  test("distributed Exact equals local Exact") {
    val a = ExactBlocker.run(spark, g, seeds, 2, 1000, 4L, distributed = false)
    val b = ExactBlocker.run(spark, g, seeds, 2, 1000, 4L, distributed = true)
    assert(a == b)
  }

  test("Exact agrees with brute-force enumeration over exact spreads on a small graph") {
    val h = ProbGraph.fromEdges(
      6,
      Seq((0, 1, 1.0), (0, 2, 1.0), (1, 3, 0.5), (2, 3, 0.5), (3, 4, 1.0), (3, 5, 0.5)))
    val (blockers, _) = ExactBlocker.run(spark, h, Set(0), 1, 20000, 5L, distributed = false)
    val best = (1 until 6).minBy(u => (ExactSpread.spreadWithBlockers(h, Array(0), Seq(u)), u))
    assert(blockers == Seq(best))
  }

  test("budget larger than candidate count is clamped") {
    val h = ProbGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0)))
    val (blockers, spread) = ExactBlocker.run(spark, h, Set(0), 10, 100, 6L, distributed = false)
    assert(blockers.toSet == Set(1, 2))
    assert(spread == 1.0)
  }

  test("multi-seed Exact evaluates on the original graph") {
    val h = ProbGraph.fromEdges(5, Seq((0, 2, 1.0), (1, 2, 1.0), (2, 3, 1.0), (2, 4, 1.0)))
    val (blockers, spread) = ExactBlocker.run(spark, h, Set(0, 1), 1, 100, 7L, distributed = false)
    assert(blockers == Seq(2))
    assert(spread == 2.0) // both seeds survive, everything else blocked
  }
}
