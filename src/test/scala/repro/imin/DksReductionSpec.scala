package repro.imin

import org.scalatest.funsuite.AnyFunSuite
import repro.spread.ExactSpread

class DksReductionSpec extends AnyFunSuite {

  // The 4-vertex 4-edge example of Figure 2.
  private val fig2Edges = Seq((0, 1), (1, 2), (2, 3), (3, 0))

  test("construction has n + m + 1 vertices and n + 2m edges, all certain") {
    val inst = DksReduction.build(4, fig2Edges)
    assert(inst.graph.n == 4 + 4 + 1)
    assert(inst.graph.m == 4 + 2 * 4)
    assert(inst.graph.probs.forall(_ == 1.0))
  }

  test("seed reaches every vertex when nothing is blocked") {
    val inst = DksReduction.build(4, fig2Edges)
    assert(ExactSpread.spread(inst.graph, Array(inst.seed)) == inst.graph.n.toDouble)
  }

  test("D-vertices have no out-neighbors") {
    val inst = DksReduction.build(4, fig2Edges)
    assert(inst.dIds.forall(d => inst.graph.outDegree(d) == 0))
  }

  test("blocking the C-image of A decreases spread by exactly |A| + inducedEdges(A)") {
    val inst = DksReduction.build(4, fig2Edges)
    val base = ExactSpread.spread(inst.graph, Array(inst.seed))
    for (a <- Seq(Set(0, 1), Set(0, 2), Set(0, 1, 2), Set(1, 3), Set(0, 1, 2, 3))) {
      val blocked = a.toSeq.map(inst.cIds(_))
      val spread = ExactSpread.spreadWithBlockers(inst.graph, Array(inst.seed), blocked)
      val expected = a.size + DksReduction.inducedEdges(fig2Edges, a)
      assert(math.abs((base - spread) - expected) < 1e-12, s"A=$a")
    }
  }

  test("blocking a D-vertex decreases spread by exactly 1 (never better than C)") {
    val inst = DksReduction.build(4, fig2Edges)
    val base = ExactSpread.spread(inst.graph, Array(inst.seed))
    for (d <- inst.dIds) {
      val spread = ExactSpread.spreadWithBlockers(inst.graph, Array(inst.seed), Seq(d))
      assert(base - spread == 1.0)
    }
  }

  test("the equivalence holds on random DKS instances") {
    val rnd = new scala.util.Random(77)
    for (trial <- 1 to 15) {
      val n = 4 + rnd.nextInt(5)
      val all = for (i <- 0 until n; j <- i + 1 until n) yield (i, j)
      val edges = rnd.shuffle(all).take(3 + rnd.nextInt(2 * n)).toSeq
      val inst = DksReduction.build(n, edges)
      val base = ExactSpread.spread(inst.graph, Array(inst.seed))
      val k = 1 + rnd.nextInt(n - 1)
      val a = rnd.shuffle((0 until n).toVector).take(k).toSet
      val spread = ExactSpread.spreadWithBlockers(inst.graph, Array(inst.seed), a.toSeq.map(inst.cIds(_)))
      assert(base - spread == (a.size + DksReduction.inducedEdges(edges, a)).toDouble, s"trial=$trial")
    }
  }

  test("the optimal IMIN blocker set on the reduction solves DKS (small instance)") {
    // K4 minus one edge; the densest 2-subgraph is any edge's endpoints,
    // and for k=2 the densest pair must be an adjacent pair.
    val edges = Seq((0, 1), (0, 2), (0, 3), (1, 2), (1, 3))
    val inst = DksReduction.build(4, edges)
    val k = 2
    // enumerate all C-blocker pairs and find the spread-minimizing one
    val pairs = for (i <- 0 until 4; j <- i + 1 until 4) yield Set(i, j)
    val best = pairs.minBy(a =>
      ExactSpread.spreadWithBlockers(inst.graph, Array(inst.seed), a.toSeq.map(inst.cIds(_))))
    val bestEdges = DksReduction.inducedEdges(edges, best)
    assert(bestEdges == pairs.map(DksReduction.inducedEdges(edges, _)).max)
    assert(best.size == k)
  }

  test("invalid DKS edges are rejected") {
    intercept[IllegalArgumentException](DksReduction.build(3, Seq((0, 0))))
    intercept[IllegalArgumentException](DksReduction.build(3, Seq((0, 5))))
  }
}
