package repro.imin

import repro.{Oracle, SparkSpec}
import repro.graph.{ProbGraph, SocialGraphGen, ToyGraph}

class HeuristicsSpec extends SparkSpec {

  private val g = ToyGraph.graph
  private val seeds = Set(ToyGraph.seed)

  test("rand is deterministic in the seed") {
    val a = Heuristics.rand(g, seeds, 3, 1L)
    val b = Heuristics.rand(g, seeds, 3, 1L)
    assert(a == b)
  }

  test("rand never picks a seed") {
    for (s <- 1L to 20L)
      assert(!Heuristics.rand(g, seeds, 8, s).contains(ToyGraph.seed))
  }

  test("rand picks b distinct vertices") {
    val b = Heuristics.rand(g, seeds, 5, 2L)
    assert(b.size == 5 && b.distinct.size == 5)
  }

  test("rand with b larger than the pool returns the whole pool") {
    assert(Heuristics.rand(g, seeds, 100, 3L).toSet == (0 until g.n).toSet - ToyGraph.seed)
  }

  test("outDegree picks the highest out-degree vertices") {
    // toy out-degrees: v1=2 (seed), v5=4, v2=v4=v9=v8=1, v3=v6=v7=0
    val od = Heuristics.outDegree(g, seeds, 1)
    assert(od == Seq(ToyGraph.v(5)))
  }

  test("outDegree breaks ties by smallest id") {
    val od = Heuristics.outDegree(g, seeds, 3)
    assert(od.head == ToyGraph.v(5))
    // next come the degree-1 vertices in id order: v2 (1), v4 (3)
    assert(od.drop(1) == Seq(ToyGraph.v(2), ToyGraph.v(4)))
  }

  test("outDegree never picks a seed even if it has max degree") {
    val h = ProbGraph.fromEdges(4, Seq((0, 1, 1.0), (0, 2, 1.0), (0, 3, 1.0), (1, 2, 1.0)))
    assert(Heuristics.outDegree(h, Set(0), 2) == Seq(1, 2))
  }

  test("outDegreeDF matches the local implementation on a generated graph") {
    val graph = SocialGraphGen.powerLaw(120, 400, directed = true, seed = 9L)
    val topLocal = Heuristics.outDegree(graph, Set.empty, 10).filter(graph.outDegree(_) > 0)
    val topDF = Heuristics.outDegreeDF(spark, graph.toDF(spark), Seq.empty, 10)
      .collect().map(_.getInt(0)).toSeq
    assert(topDF == topLocal)
  }

  test("outDegreeDF respects the exclusion list") {
    val graph = SocialGraphGen.powerLaw(120, 400, directed = true, seed = 9L)
    val top1 = Heuristics.outDegreeDF(spark, graph.toDF(spark), Seq.empty, 1)
      .collect().head.getInt(0)
    val without = Heuristics.outDegreeDF(spark, graph.toDF(spark), Seq(top1), 5)
      .collect().map(_.getInt(0))
    assert(!without.contains(top1))
  }

  test("outDegreeDF top-k matches the DuckDB oracle") {
    val graph = ToyGraph.graph
    val edges = graph.toDF(spark)
    val topDF = Heuristics.outDegreeDF(spark, edges, Seq(ToyGraph.seed), 3)
    Oracle.assertEquivalent(
      topDF,
      s"""SELECT CAST(src AS INT) AS vertex, COUNT(*) AS outdeg
         |FROM edges WHERE src <> '${ToyGraph.seed}'
         |GROUP BY src ORDER BY outdeg DESC, vertex ASC LIMIT 3""".stripMargin,
      "edges" -> edges)
  }
}
