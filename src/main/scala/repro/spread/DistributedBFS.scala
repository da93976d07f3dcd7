package repro.spread

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Iterative spread (reachability) computation over a partitioned edge
  * table — frontier-expansion BFS expressed entirely as DataFrame joins.
  *
  * This is the distributed-dataflow form of "which vertices does the seed
  * reach in a (sampled) graph": each round joins the current frontier with
  * the edge table, subtracts already-visited vertices, and unions the rest
  * into the visited set. `localCheckpoint` truncates the growing lineage.
  * Verified against the local BFS, a GraphX Pregel run, and a DuckDB
  * `WITH RECURSIVE` oracle.
  */
object DistributedBFS {

  /** Vertices reachable from `roots` over `edges(src, dst)` (roots included).
    * Returns a single-column `DataFrame("vertex")`.
    */
  def reachable(spark: SparkSession, edges: DataFrame, roots: Seq[Int]): DataFrame = {
    import spark.implicits._
    val e = edges.select(col("src").cast("int"), col("dst").cast("int")).cache()
    var visited = roots.distinct.toDF("vertex").localCheckpoint(true)
    var frontier = visited
    var frontierSize = frontier.count()
    while (frontierSize > 0) {
      val next = e
        .join(frontier, e("src") === frontier("vertex"))
        .select(e("dst").as("vertex"))
        .distinct()
        .except(visited)
        .localCheckpoint(true)
      frontierSize = next.count()
      if (frontierSize > 0) visited = visited.union(next).localCheckpoint(true)
      frontier = next
    }
    e.unpersist()
    visited
  }

  /** Expected spread of `roots` over a *deterministic* graph (all kept edges
    * treated as certain): simply the reachable-set size.
    */
  def spread(spark: SparkSession, edges: DataFrame, roots: Seq[Int]): Long =
    reachable(spark, edges, roots).count()
}
