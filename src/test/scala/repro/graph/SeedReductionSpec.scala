package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.spread.ExactSpread

class SeedReductionSpec extends AnyFunSuite {

  test("single-seed reduction rewires seed edges to the super seed") {
    val g = ToyGraph.graph
    val red = SeedReduction.reduce(g, Set(ToyGraph.seed))
    assert(red.superSeed == g.n)
    assert(red.graph.n == g.n + 1)
    // s' -> v2 and s' -> v4 with probability 1 replace v1's edges
    assert(red.graph.outNeighbors(red.superSeed).toSet == Set(ToyGraph.v(2), ToyGraph.v(4)))
    assert(red.graph.outDegree(ToyGraph.seed) == 0)
  }

  test("two seeds pointing at the same vertex combine probabilities") {
    // s1 -> u (0.5), s2 -> u (0.5)  =>  s' -> u with 1 - 0.5*0.5 = 0.75
    val g = ProbGraph.fromEdges(3, Seq((0, 2, 0.5), (1, 2, 0.5)))
    val red = SeedReduction.reduce(g, Set(0, 1))
    val e = red.graph.edgeTriples
    assert(e.size == 1)
    assert(e.head._1 == red.superSeed && e.head._2 == 2)
    assert(math.abs(e.head._3 - 0.75) < 1e-12)
  }

  test("edges into seeds are dropped") {
    val g = ProbGraph.fromEdges(3, Seq((1, 0, 0.9), (0, 2, 0.4)))
    val red = SeedReduction.reduce(g, Set(0))
    assert(red.graph.edgeTriples.forall(_._2 != 0))
  }

  test("seed-to-seed edges are dropped") {
    val g = ProbGraph.fromEdges(3, Seq((0, 1, 0.9), (0, 2, 0.4)))
    val red = SeedReduction.reduce(g, Set(0, 1))
    assert(red.graph.edgeTriples.map(t => (t._1, t._2)).toSet == Set((3, 2)))
  }

  test("non-seed edges keep their probabilities") {
    val g = ProbGraph.fromEdges(4, Seq((0, 1, 1.0), (1, 2, 0.3), (2, 3, 0.6)))
    val red = SeedReduction.reduce(g, Set(0))
    assert(red.graph.edgeTriples.toSet.contains((1, 2, 0.3)))
    assert(red.graph.edgeTriples.toSet.contains((2, 3, 0.6)))
  }

  test("reduction preserves exact expected spread (single seed)") {
    val g = ToyGraph.graph
    val red = SeedReduction.reduce(g, Set(ToyGraph.seed))
    val orig = ExactSpread.spread(g, Array(ToyGraph.seed))
    val reduced = ExactSpread.spread(red.graph, Array(red.superSeed))
    assert(math.abs(red.toOriginalSpread(reduced) - orig) < 1e-9)
  }

  test("reduction preserves exact expected spread (multi seed)") {
    // small graph with overlapping influence from two seeds
    val g = ProbGraph.fromEdges(
      6,
      Seq((0, 2, 0.5), (1, 2, 0.5), (0, 3, 1.0), (1, 4, 0.4), (2, 5, 0.8), (3, 5, 0.3)))
    val seeds = Set(0, 1)
    val red = SeedReduction.reduce(g, seeds)
    val orig = ExactSpread.spread(g, seeds.toArray.sorted)
    val reduced = ExactSpread.spread(red.graph, Array(red.superSeed))
    assert(math.abs(red.toOriginalSpread(reduced) - orig) < 1e-9)
  }

  test("reduction preserves spread under blocking any single vertex") {
    val g = ProbGraph.fromEdges(
      6,
      Seq((0, 2, 0.5), (1, 2, 0.5), (0, 3, 1.0), (1, 4, 0.4), (2, 5, 0.8), (3, 5, 0.3)))
    val seeds = Set(0, 1)
    val red = SeedReduction.reduce(g, seeds)
    for (v <- 2 until 6) {
      val orig = ExactSpread.spreadWithBlockers(g, seeds.toArray.sorted, Seq(v))
      val reduced = ExactSpread.spreadWithBlockers(red.graph, Array(red.superSeed), Seq(v))
      assert(math.abs(red.toOriginalSpread(reduced) - orig) < 1e-9, s"block $v")
    }
  }

  test("toOriginalSpread accounting: |S| + reduced - 1") {
    val g = ProbGraph.fromEdges(3, Seq((0, 2, 1.0)))
    val red = SeedReduction.reduce(g, Set(0, 1))
    // reduced spread = s' + v2 = 2; original = 2 seeds + v2 = 3
    assert(red.toOriginalSpread(2.0) == 3.0)
  }

  test("empty seed set is rejected") {
    intercept[IllegalArgumentException](SeedReduction.reduce(ToyGraph.graph, Set.empty))
  }

  test("out-of-range seed is rejected") {
    intercept[IllegalArgumentException](SeedReduction.reduce(ToyGraph.graph, Set(99)))
  }

  test("random graphs: reduction preserves exact spread under random blockers") {
    val rnd = new scala.util.Random(12)
    for (trial <- 1 to 15) {
      val n = 5 + rnd.nextInt(5)
      val edges = Seq.fill(8 + rnd.nextInt(6)) {
        (rnd.nextInt(n), rnd.nextInt(n), if (rnd.nextBoolean()) 1.0 else 0.5)
      }.filter(e => e._1 != e._2).take(ExactSpread.MaxUncertain)
      val g = ProbGraph.fromEdges(n, edges)
      val seeds = Set(0, 1 + rnd.nextInt(n - 1))
      val blockerPool = (0 until n).filterNot(seeds.contains)
      val blockers = rnd.shuffle(blockerPool).take(rnd.nextInt(2 + blockerPool.size / 2))
      val red = SeedReduction.reduce(g, seeds)
      val orig = ExactSpread.spreadWithBlockers(g, seeds.toArray.sorted, blockers)
      val reduced = ExactSpread.spreadWithBlockers(red.graph, Array(red.superSeed), blockers)
      assert(math.abs(red.toOriginalSpread(reduced) - orig) < 1e-9, s"trial $trial")
    }
  }
}
