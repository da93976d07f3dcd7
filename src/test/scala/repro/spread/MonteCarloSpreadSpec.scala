package repro.spread

import repro.SparkSpec
import repro.graph.{ProbGraph, ToyGraph}
import repro.imin.Blocking

class MonteCarloSpreadSpec extends SparkSpec {

  private val g = ToyGraph.graph
  private val roots = Array(ToyGraph.seed)

  test("MCS converges to the exact expected spread on the toy graph") {
    val est = MonteCarloSpread.spreadLocal(g, roots, r = 50000, masterSeed = 1L)
    assert(math.abs(est - 7.66) < 0.03, s"est=$est")
  }

  test("MCS on a deterministic graph is exact with a single round") {
    val h = ProbGraph.fromEdges(4, Seq((0, 1, 1.0), (1, 2, 1.0), (1, 3, 1.0)))
    assert(MonteCarloSpread.spreadLocal(h, Array(0), 1, 2L) == 4.0)
  }

  test("MCS with blockers converges to the exact blocked spread") {
    def v(k: Int) = ToyGraph.v(k)
    val mask = Blocking.maskOf(g.n, Seq(v(5)))
    val est = MonteCarloSpread.spreadLocal(g, roots, 20000, 3L, mask)
    assert(math.abs(est - 3.0) < 1e-9) // blocked toy graph is deterministic
  }

  test("spreadLocal is deterministic in the master seed") {
    val a = MonteCarloSpread.spreadLocal(g, roots, 500, 5L)
    val b = MonteCarloSpread.spreadLocal(g, roots, 500, 5L)
    assert(a == b)
  }

  test("distributed spread equals local spread exactly (same worlds)") {
    val local = MonteCarloSpread.spreadLocal(g, roots, 3000, 7L)
    val dist = MonteCarloSpread.spread(spark, g, roots, 3000, 7L)
    assert(math.abs(local - dist) < 1e-12, s"local=$local dist=$dist")
  }

  test("distributed spread with blockers equals local") {
    def v(k: Int) = ToyGraph.v(k)
    val mask = Blocking.maskOf(g.n, Seq(v(9)))
    val local = MonteCarloSpread.spreadLocal(g, roots, 2000, 9L, mask)
    val dist = MonteCarloSpread.spread(spark, g, roots, 2000, 9L, mask)
    assert(math.abs(local - dist) < 1e-12)
  }

  test("spreadWithBlockers helper builds the right mask") {
    def v(k: Int) = ToyGraph.v(k)
    val a = MonteCarloSpread.spreadWithBlockers(spark, g, roots, Seq(v(2), v(4)), 500, 11L)
    assert(math.abs(a - 1.0) < 1e-12) // only the seed remains
  }

  test("common random numbers: same seed gives montone spreads under growing blocker sets") {
    def v(k: Int) = ToyGraph.v(k)
    val seed = 13L
    val none = MonteCarloSpread.spreadLocal(g, roots, 2000, seed)
    val one = MonteCarloSpread.spreadLocal(g, roots, 2000, seed, Blocking.maskOf(g.n, Seq(v(9))))
    val two = MonteCarloSpread.spreadLocal(g, roots, 2000, seed, Blocking.maskOf(g.n, Seq(v(9), v(5))))
    assert(one <= none && two <= one) // holds exactly with common worlds
  }

  test("multi-seed spread counts all seeds") {
    val h = ProbGraph.fromEdges(4, Seq((0, 2, 1.0), (1, 3, 1.0)))
    assert(MonteCarloSpread.spreadLocal(h, Array(0, 1), 10, 15L) == 4.0)
  }

  test("r must be positive") {
    intercept[IllegalArgumentException](MonteCarloSpread.spreadLocal(g, roots, 0, 1L))
    intercept[IllegalArgumentException](MonteCarloSpread.spread(spark, g, roots, 0, 1L))
  }
}
