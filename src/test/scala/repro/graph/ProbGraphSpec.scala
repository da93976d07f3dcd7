package repro.graph

import repro.{Oracle, SparkSpec}

class ProbGraphSpec extends SparkSpec {

  private def diamond = ProbGraph.fromEdges(4, Seq((0, 1, 0.5), (0, 2, 1.0), (1, 3, 0.2), (2, 3, 0.7)))

  test("fromEdges builds correct vertex/edge counts") {
    val g = diamond
    assert(g.n == 4)
    assert(g.m == 4)
  }

  test("out-degrees match the edge list") {
    val g = diamond
    assert(g.outDegree(0) == 2)
    assert(g.outDegree(1) == 1)
    assert(g.outDegree(2) == 1)
    assert(g.outDegree(3) == 0)
  }

  test("outNeighbors returns the right targets") {
    val g = diamond
    assert(g.outNeighbors(0).toSet == Set(1, 2))
    assert(g.outNeighbors(3).isEmpty)
  }

  test("foreachOut visits every edge of a vertex with its probability") {
    val g = diamond
    var seen = List.empty[(Int, Double)]
    g.foreachOut(0)((_, v, p) => seen ::= (v, p))
    assert(seen.toSet == Set((1, 0.5), (2, 1.0)))
  }

  test("inDegrees counts incoming edges") {
    val g = diamond
    assert(g.inDegrees.toSeq == Seq(0, 1, 1, 2))
  }

  test("edgeTriples round-trips through fromEdges") {
    val g = diamond
    val g2 = ProbGraph.fromEdges(g.n, g.edgeTriples)
    assert(g2.edgeTriples == g.edgeTriples)
  }

  test("reverse flips every edge and preserves probabilities") {
    val g = diamond
    val r = g.reverse
    assert(r.m == g.m)
    assert(r.edgeTriples.toSet == g.edgeTriples.map { case (u, v, p) => (v, u, p) }.toSet)
  }

  test("reverse twice is the identity up to edge order") {
    val g = diamond
    assert(g.reverse.reverse.edgeTriples.toSet == g.edgeTriples.toSet)
  }

  test("blockVertices removes all edges incident to blocked vertices") {
    val g = diamond
    val blocked = Array(false, true, false, false)
    val b = g.blockVertices(blocked)
    assert(b.n == g.n)
    assert(b.edgeTriples.toSet == Set((0, 2, 1.0), (2, 3, 0.7)))
  }

  test("blockVertices with empty mask is a no-op") {
    val g = diamond
    assert(g.blockVertices(new Array[Boolean](4)).edgeTriples == g.edgeTriples)
  }

  test("blockVertices rejects wrong mask length") {
    intercept[IllegalArgumentException](diamond.blockVertices(new Array[Boolean](3)))
  }

  test("mapProbs rewrites probabilities in place") {
    val g = diamond.mapProbs((_, _, _) => 0.25)
    assert(g.probs.forall(_ == 0.25))
    assert(g.targets.toSeq == diamond.targets.toSeq)
  }

  test("fromEdges validates vertex range") {
    intercept[IllegalArgumentException](ProbGraph.fromEdges(2, Seq((0, 2, 1.0))))
  }

  test("fromEdges validates probability range") {
    intercept[IllegalArgumentException](ProbGraph.fromEdges(2, Seq((0, 1, 1.5))))
  }

  test("toDF/fromDF round-trips the graph") {
    val g = diamond
    val df = g.toDF(spark)
    assert(df.columns.toSeq == Seq("src", "dst", "p"))
    val g2 = ProbGraph.fromDF(df, g.n)
    assert(g2.edgeTriples.toSet == g.edgeTriples.toSet)
  }

  test("parallel edges are preserved") {
    val g = ProbGraph.fromEdges(2, Seq((0, 1, 0.5), (0, 1, 0.5)))
    assert(g.m == 2)
    assert(g.outDegree(0) == 2)
  }

  test("out-degree DataFrame aggregation matches DuckDB oracle") {
    val g = ToyGraph.graph
    val edges = g.toDF(spark)
    val sparkDeg = edges.groupBy(edges("src").as("vertex")).count().withColumnRenamed("count", "cnt")
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT src AS vertex, COUNT(*) AS cnt FROM edges GROUP BY src",
      "edges" -> edges)
  }

  test("in-degree DataFrame aggregation matches DuckDB oracle") {
    val g = ToyGraph.graph
    val edges = g.toDF(spark)
    val sparkDeg = edges.groupBy(edges("dst").as("vertex")).count().withColumnRenamed("count", "cnt")
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT dst AS vertex, COUNT(*) AS cnt FROM edges GROUP BY dst",
      "edges" -> edges)
  }

  test("CSR offsets are monotone and bounded on random graphs") {
    val rnd = new scala.util.Random(1)
    for (_ <- 1 to 20) {
      val n = 2 + rnd.nextInt(30)
      val edges = Seq.fill(rnd.nextInt(60))((rnd.nextInt(n), rnd.nextInt(n), rnd.nextDouble()))
      val g = ProbGraph.fromEdges(n, edges)
      assert(g.offsets.head == 0 && g.offsets.last == g.m)
      assert(g.offsets.sliding(2).forall(w => w(0) <= w(1)))
      assert((0 until n).map(g.outDegree).sum == g.m)
      assert(g.inDegrees.sum == g.m)
    }
  }
}
