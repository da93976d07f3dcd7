package repro.imin

import repro.SparkSpec
import repro.graph.{ProbGraph, ToyGraph}
import repro.spread.ExactSpread

class BaselineGreedySpec extends SparkSpec {

  private val g = ToyGraph.graph
  private val seeds = Set(ToyGraph.seed)
  private def v(k: Int) = ToyGraph.v(k)

  test("BG blocks v5 at b=1") {
    val b = BaselineGreedy.run(spark, g, seeds, 1, r = 3000, masterSeed = 1L, distributed = false)
    assert(b == Seq(v(5)))
  }

  test("BG at b=2 matches the Greedy row of Table III") {
    val b = BaselineGreedy.run(spark, g, seeds, 2, 3000, 2L, distributed = false)
    assert(b.head == v(5))
    assert(b(1) == v(2) || b(1) == v(4))
    assert(math.abs(ExactSpread.spreadWithBlockers(g, Array(ToyGraph.seed), b) - 2.0) < 1e-9)
  }

  test("BG and AG choose blocker sets of equal effectiveness (paper §V-C)") {
    for (seed <- Seq(3L, 4L)) {
      val bg = BaselineGreedy.run(spark, g, seeds, 2, 3000, seed, distributed = false)
      val ag = AdvancedGreedy.run(spark, g, seeds, 2, 3000, seed, distributed = false)
      val sBg = ExactSpread.spreadWithBlockers(g, Array(ToyGraph.seed), bg)
      val sAg = ExactSpread.spreadWithBlockers(g, Array(ToyGraph.seed), ag)
      assert(math.abs(sBg - sAg) < 0.05, s"seed=$seed bg=$bg ag=$ag")
    }
  }

  test("BG equals AG effectiveness on a random uncertain graph") {
    val rnd = new scala.util.Random(55)
    val n = 12
    val edges = Seq.fill(22)((rnd.nextInt(n), rnd.nextInt(n), 0.4 + 0.6 * rnd.nextDouble()))
      .filter(e => e._1 != e._2).distinct.take(ExactSpread.MaxUncertain)
    val h = ProbGraph.fromEdges(n, edges)
    val hSeeds = Set(0)
    val bg = BaselineGreedy.run(spark, h, hSeeds, 2, 4000, 5L, distributed = false)
    val ag = AdvancedGreedy.run(spark, h, hSeeds, 2, 4000, 5L, distributed = false)
    val sBg = ExactSpread.spreadWithBlockers(h, Array(0), bg)
    val sAg = ExactSpread.spreadWithBlockers(h, Array(0), ag)
    assert(math.abs(sBg - sAg) < 0.1, s"bg=$bg ($sBg) ag=$ag ($sAg)")
  }

  test("distributed BG equals local BG (same worlds)") {
    val a = BaselineGreedy.run(spark, g, seeds, 2, 1000, 6L, distributed = false)
    val b = BaselineGreedy.run(spark, g, seeds, 2, 1000, 6L, distributed = true)
    assert(a == b)
  }

  test("BG stops when no candidate decreases the spread") {
    val h = ProbGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0)))
    val b = BaselineGreedy.run(spark, h, Set(0), 3, 200, 7L, distributed = false)
    assert(b == Seq(1))
  }

  test("BG never blocks a seed and keeps blockers distinct") {
    val b = BaselineGreedy.run(spark, g, seeds, 4, 500, 8L, distributed = false)
    assert(!b.contains(ToyGraph.seed))
    assert(b.distinct.size == b.size)
  }

  test("parameters must be positive") {
    intercept[IllegalArgumentException](BaselineGreedy.run(spark, g, seeds, 0, 10, 1L))
    intercept[IllegalArgumentException](BaselineGreedy.run(spark, g, seeds, 1, 0, 1L))
  }
}
