package repro.sampling

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{ProbGraph, ToyGraph}
import repro.util.Rng

class TriggeringModelSpec extends AnyFunSuite {

  test("IndependentCascade triggering equals the plain live-edge sampler") {
    val g = ToyGraph.graph
    for (id <- 0L until 30L) {
      val seed = Rng.sampleSeed(1L, id)
      val a = (0 until g.m).map(TriggeringModel.IndependentCascade.liveEdge(g, seed))
      val b = (0 until g.m).map(GraphSampler.liveEdge(g, seed))
      assert(a == b)
    }
  }

  test("LinearThreshold keeps at most one live in-edge per vertex") {
    val g = ProbGraph.fromEdges(
      5,
      Seq((0, 4, 0.3), (1, 4, 0.3), (2, 4, 0.3), (3, 4, 0.1), (0, 1, 0.5), (2, 1, 0.5)))
    for (id <- 0L until 200L) {
      val live = TriggeringModel.LinearThreshold.liveEdge(g, Rng.sampleSeed(2L, id))
      val liveInOf4 = g.edgeTriples.zipWithIndex.count { case ((_, v, _), e) => v == 4 && live(e) }
      val liveInOf1 = g.edgeTriples.zipWithIndex.count { case ((_, v, _), e) => v == 1 && live(e) }
      assert(liveInOf4 <= 1)
      assert(liveInOf1 <= 1)
    }
  }

  test("LinearThreshold edge selection frequency is proportional to weight") {
    val g = ProbGraph.fromEdges(3, Seq((0, 2, 0.6), (1, 2, 0.2)))
    val n = 20000
    var e0 = 0; var e1 = 0; var none = 0
    for (id <- 0L until n.toLong) {
      val live = TriggeringModel.LinearThreshold.liveEdge(g, Rng.sampleSeed(3L, id))
      if (live(0)) e0 += 1 else if (live(1)) e1 += 1 else none += 1
    }
    assert(math.abs(e0.toDouble / n - 0.6) < 0.02, s"e0=${e0.toDouble / n}")
    assert(math.abs(e1.toDouble / n - 0.2) < 0.02, s"e1=${e1.toDouble / n}")
    assert(math.abs(none.toDouble / n - 0.2) < 0.02, s"none=${none.toDouble / n}")
  }

  test("LinearThreshold sampling is deterministic in the sample seed") {
    val g = ToyGraph.graph
    val seed = Rng.sampleSeed(4L, 5L)
    val a = (0 until g.m).map(TriggeringModel.LinearThreshold.liveEdge(g, seed))
    val b = (0 until g.m).map(TriggeringModel.LinearThreshold.liveEdge(g, seed))
    assert(a == b)
  }

  test("delta estimation runs under a triggering model") {
    val g = ToyGraph.graph
    val delta = DeltaEstimator.estimateLocal(
      g, ToyGraph.seed, 2000, 6L, TriggeringModel.LinearThreshold)
    // v5 still dominates its subtree under LT sampling; it must be the best blocker
    val best = (0 until g.n).filter(_ != ToyGraph.seed).maxBy(delta)
    assert(best == ToyGraph.v(5))
  }
}
