package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class SocialGraphGenSpec extends AnyFunSuite {

  test("generator is deterministic in the seed") {
    val a = SocialGraphGen.powerLaw(100, 300, directed = true, seed = 5L)
    val b = SocialGraphGen.powerLaw(100, 300, directed = true, seed = 5L)
    assert(a.edgeTriples == b.edgeTriples)
  }

  test("different seeds give different graphs") {
    val a = SocialGraphGen.powerLaw(100, 300, directed = true, seed = 5L)
    val b = SocialGraphGen.powerLaw(100, 300, directed = true, seed = 6L)
    assert(a.edgeTriples != b.edgeTriples)
  }

  test("directed generator hits the requested edge count") {
    val g = SocialGraphGen.powerLaw(200, 800, directed = true, seed = 1L)
    assert(g.m == 800)
  }

  test("undirected generator emits both directions of every pair") {
    val g = SocialGraphGen.powerLaw(200, 400, directed = false, seed = 2L)
    assert(g.m == 800)
    val set = g.edgeTriples.map(t => (t._1, t._2)).toSet
    assert(set.forall { case (u, v) => set.contains((v, u)) })
  }

  test("no self-loops") {
    val g = SocialGraphGen.powerLaw(150, 500, directed = true, seed = 3L)
    assert(g.edgeTriples.forall(t => t._1 != t._2))
  }

  test("no duplicate directed edges") {
    val g = SocialGraphGen.powerLaw(150, 500, directed = true, seed = 3L)
    val pairs = g.edgeTriples.map(t => (t._1, t._2))
    assert(pairs.distinct.size == pairs.size)
  }

  test("degree distribution is heavy-tailed (hub far above average)") {
    val g = SocialGraphGen.powerLaw(500, 3000, directed = true, seed = 4L)
    val maxOut = (0 until g.n).map(g.outDegree).max
    val avgOut = g.m.toDouble / g.n
    assert(maxOut > 5 * avgOut, s"max=$maxOut avg=$avgOut")
  }

  test("all probabilities start at 1.0") {
    val g = SocialGraphGen.powerLaw(50, 100, directed = true, seed = 5L)
    assert(g.probs.forall(_ == 1.0))
  }

  test("trivalency assigns only {0.1, 0.01, 0.001} and is deterministic") {
    val g = SocialGraphGen.powerLaw(100, 400, directed = true, seed = 6L)
    val t1 = PropModels.trivalency(g, 9L)
    val t2 = PropModels.trivalency(g, 9L)
    assert(t1.probs.toSeq == t2.probs.toSeq)
    assert(t1.probs.forall(p => p == 0.1 || p == 0.01 || p == 0.001))
  }

  test("trivalency uses all three values on a large enough graph") {
    val g = SocialGraphGen.powerLaw(200, 1000, directed = true, seed = 7L)
    val t = PropModels.trivalency(g, 10L)
    assert(t.probs.toSet == Set(0.1, 0.01, 0.001))
  }

  test("trivalency draws each value about a third of the time") {
    val g = SocialGraphGen.powerLaw(500, 5000, directed = true, seed = 7L)
    val t = PropModels.trivalency(g, 11L)
    for (v <- Seq(0.1, 0.01, 0.001)) {
      val freq = t.probs.count(_ == v).toDouble / t.m
      assert(math.abs(freq - 1.0 / 3) < 0.03, s"value $v freq $freq")
    }
  }

  test("weighted cascade sets p = 1/inDegree(target)") {
    val g = ProbGraph.fromEdges(4, Seq((0, 2, 1.0), (1, 2, 1.0), (0, 3, 1.0), (2, 3, 1.0)))
    val wc = PropModels.weightedCascade(g)
    for ((u, v, p) <- wc.edgeTriples)
      assert(p == 1.0 / g.inDegrees(v), s"($u,$v)")
  }

  test("weighted cascade on a generated graph keeps probabilities in (0,1]") {
    val g = SocialGraphGen.powerLaw(200, 800, directed = true, seed = 8L)
    val wc = PropModels.weightedCascade(g)
    assert(wc.probs.forall(p => p > 0.0 && p <= 1.0))
  }

  test("generator preserves structure when probabilities are remapped") {
    val g = SocialGraphGen.powerLaw(100, 300, directed = true, seed = 9L)
    val t = PropModels.trivalency(g, 1L)
    assert(t.targets.toSeq == g.targets.toSeq)
    assert(t.offsets.toSeq == g.offsets.toSeq)
  }
}
