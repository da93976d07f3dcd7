package repro.spread

import org.apache.spark.sql.SparkSession
import repro.graph.ProbGraph
import repro.sampling.GraphSampler
import repro.util.Rng

/** Monte-Carlo Simulation (MCS) estimation of the expected spread — the
  * spread oracle of the paper's baselines [7]: each simulation keeps every
  * edge with its propagation probability and counts the vertices reachable
  * from the seeds (Lemma 1). All simulations are keyed by pure per-sample
  * seeds, so evaluations of different blocker sets under the same
  * `masterSeed` use common random numbers (identical sampled worlds).
  */
object MonteCarloSpread {

  /** Driver-side estimate over `r` simulations. */
  def spreadLocal(
      g: ProbGraph,
      roots: Array[Int],
      r: Int,
      masterSeed: Long,
      blocked: Array[Boolean] = null): Double = {
    require(r >= 1, "r must be positive")
    var sum = 0L
    var i = 0L
    while (i < r) {
      sum += GraphSampler.reachCount(g, roots, Rng.sampleSeed(masterSeed, i), blocked)
      i += 1
    }
    sum.toDouble / r
  }

  /** Distributed estimate: `r` simulations fanned out over `spark.range(r)`,
    * partition-local sums of reach counts, merged on the driver.
    */
  def spread(
      spark: SparkSession,
      g: ProbGraph,
      roots: Array[Int],
      r: Int,
      masterSeed: Long,
      blocked: Array[Boolean] = null): Double = {
    require(r >= 1, "r must be positive")
    import spark.implicits._
    val bc = spark.sparkContext.broadcast((g, roots, Option(blocked)))
    try {
      val total = spark
        .range(r)
        .as[Long]
        .mapPartitions { ids =>
          val (graph, rs, blk) = bc.value
          var sum = 0L
          ids.foreach(id => sum += GraphSampler.reachCount(graph, rs, Rng.sampleSeed(masterSeed, id), blk.orNull))
          Iterator.single(sum)
        }
        .collect()
        .sum
      total.toDouble / r
    } finally bc.destroy()
  }

  /** Spread after blocking `blockers`, distributed. */
  def spreadWithBlockers(
      spark: SparkSession,
      g: ProbGraph,
      roots: Array[Int],
      blockers: Iterable[Int],
      r: Int,
      masterSeed: Long): Double = {
    val mask = new Array[Boolean](g.n)
    blockers.foreach(mask(_) = true)
    spread(spark, g, roots, r, masterSeed, mask)
  }
}
