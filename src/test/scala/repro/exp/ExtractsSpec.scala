package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.SocialGraphGen

class ExtractsSpec extends AnyFunSuite {

  private val base = SocialGraphGen.powerLaw(300, 1500, directed = true, seed = 3L)

  test("extract reaches at least the target size") {
    val (sub, _) = Extracts.neighborhoodExtract(base, 30, 1L)
    assert(sub.n >= 30)
  }

  test("extract is deterministic in the seed") {
    val (a, _) = Extracts.neighborhoodExtract(base, 30, 2L)
    val (b, _) = Extracts.neighborhoodExtract(base, 30, 2L)
    assert(a.edgeTriples == b.edgeTriples)
  }

  test("id map is a bijection onto 0 until size") {
    val (sub, map) = Extracts.neighborhoodExtract(base, 25, 3L)
    assert(map.values.toSet == (0 until sub.n).toSet)
    assert(map.keys.forall(k => k >= 0 && k < base.n))
  }

  test("extract contains exactly the induced edges") {
    val (sub, map) = Extracts.neighborhoodExtract(base, 25, 4L)
    val chosen = map.keySet
    val expected = base.edgeTriples.collect {
      case (u, v, p) if chosen(u) && chosen(v) => (map(u), map(v), p)
    }.toSet
    assert(sub.edgeTriples.toSet == expected)
  }

  test("edge probabilities are inherited") {
    val tr = repro.graph.PropModels.trivalency(base, 5L)
    val (sub, _) = Extracts.neighborhoodExtract(tr, 25, 5L)
    assert(sub.probs.forall(p => p == 0.1 || p == 0.01 || p == 0.001))
  }

  test("different seeds give different extracts") {
    val (a, _) = Extracts.neighborhoodExtract(base, 25, 6L)
    val (b, _) = Extracts.neighborhoodExtract(base, 25, 7L)
    assert(a.edgeTriples != b.edgeTriples)
  }
}
