package repro.spread

import repro.{Oracle, SparkSpec}
import repro.graph.{ProbGraph, ToyGraph}
import repro.sampling.GraphSampler

class DistributedBFSSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private def edgesDF(g: ProbGraph) = g.toDF(spark).select(col("src"), col("dst"))

  test("reachable on the toy graph finds all 9 vertices over certain+uncertain edges") {
    val g = ToyGraph.graph
    val reach = DistributedBFS.reachable(spark, edgesDF(g), Seq(ToyGraph.seed))
    assert(reach.collect().map(_.getInt(0)).toSet == (0 until 9).toSet)
  }

  test("reachable stops at disconnected components") {
    val g = ProbGraph.fromEdges(5, Seq((0, 1, 1.0), (1, 2, 1.0), (3, 4, 1.0)))
    val reach = DistributedBFS.reachable(spark, edgesDF(g), Seq(0))
    assert(reach.collect().map(_.getInt(0)).toSet == Set(0, 1, 2))
  }

  test("reachable handles cycles") {
    val g = ProbGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 2, 1.0), (2, 0, 1.0)))
    assert(DistributedBFS.spread(spark, edgesDF(g), Seq(0)) == 3L)
  }

  test("reachable with multiple roots unions their reaches") {
    val g = ProbGraph.fromEdges(6, Seq((0, 2, 1.0), (1, 3, 1.0), (3, 4, 1.0)))
    val reach = DistributedBFS.reachable(spark, edgesDF(g), Seq(0, 1))
    assert(reach.collect().map(_.getInt(0)).toSet == Set(0, 1, 2, 3, 4))
  }

  test("a root with no outgoing edges reaches only itself") {
    val g = ProbGraph.fromEdges(3, Seq((0, 1, 1.0)))
    assert(DistributedBFS.spread(spark, edgesDF(g), Seq(2)) == 1L)
  }

  test("DataFrame BFS matches the local sampler BFS on random graphs") {
    val rnd = new scala.util.Random(31)
    for (trial <- 1 to 5) {
      val n = 10 + rnd.nextInt(30)
      val edges = Seq.fill(3 * n)((rnd.nextInt(n), rnd.nextInt(n), 1.0)).filter(e => e._1 != e._2)
      val g = ProbGraph.fromEdges(n, edges.distinct)
      val root = rnd.nextInt(n)
      val local = GraphSampler.reachSet(g, Array(root), sampleSeed = 1L)
      val dist = DistributedBFS.reachable(spark, edgesDF(g), Seq(root))
        .collect().map(_.getInt(0)).toSet
      assert(dist == local, s"trial=$trial root=$root")
    }
  }

  test("DataFrame BFS matches DuckDB WITH RECURSIVE oracle") {
    val g = ToyGraph.graph
    val edges = edgesDF(g)
    val reach = DistributedBFS.reachable(spark, edges, Seq(ToyGraph.seed))
    Oracle.assertEquivalent(
      reach,
      s"""WITH RECURSIVE reach AS (
         |  SELECT '${ToyGraph.seed}' AS vertex
         |  UNION
         |  SELECT e.dst AS vertex FROM edges e JOIN reach r ON e.src = r.vertex
         |) SELECT vertex FROM reach""".stripMargin,
      "edges" -> edges)
  }

  test("DataFrame BFS matches DuckDB recursive oracle on a random graph") {
    val rnd = new scala.util.Random(37)
    val n = 25
    val edges = Seq.fill(60)((rnd.nextInt(n), rnd.nextInt(n), 1.0)).filter(e => e._1 != e._2).distinct
    val g = ProbGraph.fromEdges(n, edges)
    val df = edgesDF(g)
    val reach = DistributedBFS.reachable(spark, df, Seq(0))
    Oracle.assertEquivalent(
      reach,
      """WITH RECURSIVE reach AS (
        |  SELECT '0' AS vertex
        |  UNION
        |  SELECT e.dst AS vertex FROM edges e JOIN reach r ON e.src = r.vertex
        |) SELECT vertex FROM reach""".stripMargin,
      "edges" -> df)
  }

  test("GraphX Pregel reachability agrees with DataFrame BFS") {
    val g = ToyGraph.graph
    val viaGraphX = GraphXReach.reachable(spark, g, Set(ToyGraph.seed))
    val viaDF = DistributedBFS.reachable(spark, edgesDF(g), Seq(ToyGraph.seed))
      .collect().map(_.getInt(0)).toSet
    assert(viaGraphX == viaDF)
  }

  test("GraphX Pregel respects a live-edge predicate") {
    val g = ToyGraph.graph
    def v(k: Int) = ToyGraph.v(k)
    // drop both edges into v8 — v8 and v7 become unreachable
    val dropTargets = Set(v(8))
    val keep = (e: Int) => !dropTargets.contains(g.targets(e))
    val reach = GraphXReach.reachable(spark, g, Set(ToyGraph.seed), keep)
    assert(reach == Set(v(1), v(2), v(3), v(4), v(5), v(6), v(9)))
  }

  test("GraphX Pregel matches the local sampler on a random sampled world") {
    val rnd = new scala.util.Random(41)
    val n = 20
    val edges = Seq.fill(50)((rnd.nextInt(n), rnd.nextInt(n), 0.5)).filter(e => e._1 != e._2).distinct
    val g = ProbGraph.fromEdges(n, edges)
    val sampleSeed = repro.util.Rng.sampleSeed(5L, 9L)
    val local = GraphSampler.reachSet(g, Array(0), sampleSeed)
    val viaGraphX = GraphXReach.reachable(spark, g, Set(0), GraphSampler.liveEdge(g, sampleSeed))
    assert(viaGraphX == local)
  }
}
