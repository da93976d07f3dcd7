package repro.imin

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.ProbGraph
import scala.util.Random

/** The two simple baselines of the experiments (§VI-A): Rand (RA) and
  * OutDegree (OD).
  */
object Heuristics {

  /** RA: `b` uniformly random distinct non-seed vertices, deterministic in
    * `seed`.
    */
  def rand(g: ProbGraph, seeds: Set[Int], b: Int, seed: Long): Seq[Int] = {
    val rnd = new Random(seed)
    val pool = (0 until g.n).filterNot(seeds.contains)
    rnd.shuffle(pool).take(b)
  }

  /** OD: the `b` non-seed vertices with the highest out-degree (ties broken
    * by smallest id). Local reference implementation.
    */
  def outDegree(g: ProbGraph, seeds: Set[Int], b: Int): Seq[Int] =
    (0 until g.n)
      .filterNot(seeds.contains)
      .sortBy(v => (-g.outDegree(v), v))
      .take(b)

  /** OD as a Spark SQL dataflow over the canonical edge DataFrame: degree
    * aggregation + deterministic top-k. Oracle-checked against DuckDB; the
    * result set equals [[outDegree]] restricted to vertices with ≥ 1
    * out-edge.
    */
  def outDegreeDF(spark: SparkSession, edges: DataFrame, exclude: Seq[Int], b: Int): DataFrame = {
    import spark.implicits._
    val ex = exclude.toDF("x")
    edges
      .groupBy(col("src").as("vertex"))
      .agg(count(lit(1)).as("outdeg"))
      .join(ex, col("vertex") === col("x"), "left_anti")
      .orderBy(col("outdeg").desc, col("vertex").asc)
      .limit(b)
  }
}
