package repro.exp

import org.scalatest.funsuite.AnyFunSuite

class DatasetsSpec extends AnyFunSuite {

  test("registry lists the paper's 8 datasets in Table IV order") {
    assert(Datasets.all.map(_.name) == Seq(
      "EmailCore", "Facebook", "Wiki-Vote", "EmailAll", "DBLP", "Twitter", "Stanford", "Youtube"))
  }

  test("registry preserves the paper's directedness") {
    val directed = Datasets.all.filter(_.directed).map(_.name).toSet
    assert(directed == Set("EmailCore", "Wiki-Vote", "EmailAll", "Twitter", "Stanford"))
  }

  test("registry carries the paper's Table IV statistics") {
    val email = Datasets.byName("EmailCore")
    assert(email.paperN == 1005 && email.paperM == 25571 && email.paperDmax == 544)
    val yt = Datasets.byName("Youtube")
    assert(yt.paperN == 1134890 && yt.paperM == 2987624)
  }

  test("paper ordering by edge count is preserved in the scaled substitutes' spec order") {
    assert(Datasets.all.map(_.paperM) == Datasets.all.map(_.paperM).sorted)
  }

  test("graph generation is deterministic per spec") {
    val spec = Datasets.byName("EmailCore")
    assert(spec.graph.edgeTriples == spec.graph.edgeTriples)
  }

  test("scaled sizes match the spec") {
    for (spec <- Datasets.all.take(3)) {
      val g = spec.graph
      assert(g.n == spec.scaledN)
      assert(spec.rawEdgeCount(g) <= spec.scaledPairs)
      assert(spec.rawEdgeCount(g) >= (spec.scaledPairs * 0.9).toInt, spec.name)
    }
  }

  test("undirected substitutes are symmetric") {
    val g = Datasets.byName("Facebook").graph
    val set = g.edgeTriples.map(t => (t._1, t._2)).toSet
    assert(set.forall { case (u, v) => set.contains((v, u)) })
  }

  test("withModel TR assigns trivalency probabilities") {
    val spec = Datasets.byName("EmailCore")
    val g = Datasets.withModel(spec.graph, "TR", spec.seed)
    assert(g.probs.forall(p => p == 0.1 || p == 0.01 || p == 0.001))
  }

  test("withModel WC assigns 1/inDegree") {
    val spec = Datasets.byName("EmailCore")
    val base = spec.graph
    val g = Datasets.withModel(base, "WC", spec.seed)
    for ((t, i) <- g.edgeTriples.zipWithIndex.take(200))
      assert(t._3 == 1.0 / base.inDegrees(t._2), s"edge $i")
  }

  test("unknown model is rejected") {
    intercept[RuntimeException](Datasets.withModel(Datasets.byName("EmailCore").graph, "XX", 1L))
  }

  test("randomSeeds is deterministic, distinct and avoids sinks") {
    val g = Datasets.byName("EmailCore").graph
    val a = Datasets.randomSeeds(g, 10, 1L)
    val b = Datasets.randomSeeds(g, 10, 1L)
    assert(a == b)
    assert(a.size == 10)
    assert(a.forall(g.outDegree(_) > 0))
  }

  test("unknown dataset name is rejected") {
    intercept[RuntimeException](Datasets.byName("NoSuch"))
  }
}
