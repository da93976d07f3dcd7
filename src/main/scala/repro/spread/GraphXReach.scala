package repro.spread

import org.apache.spark.graphx.{Edge, Graph, Pregel, VertexId, EdgeTriplet}
import org.apache.spark.sql.SparkSession
import repro.graph.ProbGraph

/** GraphX/Pregel reachability — the RDD-layer parity substrate for
  * [[DistributedBFS]] (the calibration hint maps the paper onto GraphX
  * iterative computation; the Dataset path remains primary per the repo's
  * layering rule, and this variant proves both substrates agree).
  */
object GraphXReach {

  /** Vertices reachable from `roots` in `g` restricted to edges satisfying
    * `keepEdge` (evaluated on the driver while building the edge RDD).
    */
  def reachable(spark: SparkSession, g: ProbGraph, roots: Set[Int], keepEdge: Int => Boolean = _ => true): Set[Int] = {
    val sc = spark.sparkContext
    val edges = sc.parallelize(
      (0 until g.n).flatMap { u =>
        (g.offsets(u) until g.offsets(u + 1)).collect {
          case e if keepEdge(e) => Edge(u.toLong, g.targets(e).toLong, ())
        }
      })
    val vertices = sc.parallelize((0 until g.n).map(v => (v.toLong, roots.contains(v))))
    val graph = Graph(vertices, edges)
    val result = Pregel(graph, initialMsg = false)(
      vprog = (_: VertexId, reached: Boolean, msg: Boolean) => reached || msg,
      sendMsg = (t: EdgeTriplet[Boolean, Unit]) =>
        if (t.srcAttr && !t.dstAttr) Iterator((t.dstId, true)) else Iterator.empty,
      mergeMsg = (a: Boolean, b: Boolean) => a || b)
    result.vertices.filter(_._2).map(_._1.toInt).collect().toSet
  }
}
