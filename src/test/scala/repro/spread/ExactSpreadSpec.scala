package repro.spread

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{ProbGraph, ToyGraph}

class ExactSpreadSpec extends AnyFunSuite {

  test("deterministic chain: spread equals path length") {
    val g = ProbGraph.fromEdges(4, Seq((0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0)))
    assert(ExactSpread.spread(g, Array(0)) == 4.0)
  }

  test("single uncertain edge: spread is 1 + p") {
    val g = ProbGraph.fromEdges(2, Seq((0, 1, 0.3)))
    assert(math.abs(ExactSpread.spread(g, Array(0)) - 1.3) < 1e-12)
  }

  test("two parallel uncertain paths combine with inclusion-exclusion") {
    // 0 -> 1 (0.5), 0 -> 2 (1.0), 2 -> 1 (0.4): P(1) = 1 - 0.5*0.6 = 0.7
    val g = ProbGraph.fromEdges(3, Seq((0, 1, 0.5), (0, 2, 1.0), (2, 1, 0.4)))
    val p = ExactSpread.activationProbs(g, Array(0))
    assert(math.abs(p(1) - 0.7) < 1e-12)
    assert(p(2) == 1.0)
  }

  test("serial uncertain edges multiply") {
    val g = ProbGraph.fromEdges(3, Seq((0, 1, 0.5), (1, 2, 0.4)))
    val p = ExactSpread.activationProbs(g, Array(0))
    assert(math.abs(p(2) - 0.2) < 1e-12)
  }

  test("zero-probability edges never propagate") {
    val g = ProbGraph.fromEdges(2, Seq((0, 1, 0.0)))
    assert(ExactSpread.spread(g, Array(0)) == 1.0)
  }

  test("toy graph spread matches Example 1") {
    assert(math.abs(ExactSpread.spread(ToyGraph.graph, Array(ToyGraph.seed)) - 7.66) < 1e-9)
  }

  test("multi-seed spread counts each seed once") {
    val g = ProbGraph.fromEdges(4, Seq((0, 2, 1.0), (1, 2, 1.0), (2, 3, 0.5)))
    // seeds 0,1; P(2)=1, P(3)=0.5 -> E = 2 + 1 + 0.5
    assert(math.abs(ExactSpread.spread(g, Array(0, 1)) - 3.5) < 1e-12)
  }

  test("blocked vertices have activation probability zero and stop propagation") {
    val g = ProbGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0)))
    val blocked = Array(false, true, false)
    val p = ExactSpread.activationProbs(g, Array(0), blocked)
    assert(p.toSeq == Seq(1.0, 0.0, 0.0))
  }

  test("spreadWithBlockers equals spread on the blocked graph") {
    val g = ToyGraph.graph
    def v(k: Int) = ToyGraph.v(k)
    for (b <- Seq(Seq(v(5)), Seq(v(2), v(4)), Seq(v(9), v(8)))) {
      val a = ExactSpread.spreadWithBlockers(g, Array(ToyGraph.seed), b)
      val mask = new Array[Boolean](g.n); b.foreach(mask(_) = true)
      val viaInduced = ExactSpread.spread(g.blockVertices(mask), Array(ToyGraph.seed))
      assert(math.abs(a - viaInduced) < 1e-12, s"blockers $b")
    }
  }

  test("too many uncertain edges are rejected") {
    val m = ExactSpread.MaxUncertain + 1
    val g = ProbGraph.fromEdges(m + 1, (0 until m).map(i => (i, i + 1, 0.5)))
    intercept[IllegalArgumentException](ExactSpread.spread(g, Array(0)))
  }

  test("probabilities are in [0,1] and monotone under fewer blockers") {
    val g = ToyGraph.graph
    val p = ExactSpread.activationProbs(g, Array(ToyGraph.seed))
    assert(p.forall(x => x >= 0.0 && x <= 1.0))
  }

  test("world probabilities sum to 1 (spread of an isolated seed is 1)") {
    val g = ProbGraph.fromEdges(3, Seq((1, 2, 0.5)))
    assert(ExactSpread.spread(g, Array(0)) == 1.0)
  }
}
