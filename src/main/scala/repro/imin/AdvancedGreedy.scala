package repro.imin

import org.apache.spark.sql.SparkSession
import repro.graph.ProbGraph
import repro.sampling.{DeltaEstimator, TriggeringModel}
import repro.util.Rng
import scala.collection.mutable.ArrayBuffer

/** AdvancedGreedy (Algorithm 3 of the paper): in each of the `b` rounds,
  * estimate the spread decrease of *every* candidate blocker at once with
  * DecreaseESComputation (sampled graphs + dominator trees, Algorithm 2)
  * on the currently blocked graph, and block the maximizer.
  *
  * Effectiveness matches BaselineGreedy with θ = r (same sampled-world
  * semantics, §V-C) at a per-round cost of O(θ·m·α(m,n)) instead of
  * O(n·r·m).
  */
object AdvancedGreedy {

  /** Run AG and return the blocker insertion order (≤ b vertices — selection
    * stops early once no candidate can decrease the spread).
    *
    * @param distributed fan the θ samples out as a Spark job per round; the
    *                    local path is numerically identical (same seeds)
    */
  def run(
      spark: SparkSession,
      g: ProbGraph,
      seeds: Set[Int],
      b: Int,
      theta: Int,
      masterSeed: Long,
      distributed: Boolean = true,
      model: TriggeringModel = TriggeringModel.IndependentCascade): Seq[Int] =
    runWithCheckpoints(spark, g, seeds, Seq(b), theta, masterSeed, distributed, model)(b)

  /** Run AG once up to `budgets.max` and return the blocker prefix at every
    * requested budget (greedy selection is prefix-monotone, so one pass
    * serves a whole budget sweep).
    */
  def runWithCheckpoints(
      spark: SparkSession,
      g: ProbGraph,
      seeds: Set[Int],
      budgets: Seq[Int],
      theta: Int,
      masterSeed: Long,
      distributed: Boolean = true,
      model: TriggeringModel = TriggeringModel.IndependentCascade): Map[Int, Seq[Int]] = {
    require(budgets.nonEmpty && budgets.forall(_ >= 1), "budgets must be positive")
    val b = budgets.max
    val (red, notSeed) = Blocking.reduced(g, seeds)
    val rg = red.graph
    val blocked = new Array[Boolean](rg.n)
    val order = ArrayBuffer.empty[Int]

    var i = 0
    var exhausted = false
    while (i < b && !exhausted) {
      val current = rg.blockVertices(blocked)
      val roundSeed = Rng.splitmix64(masterSeed ^ (i + 1).toLong)
      val delta =
        if (distributed) DeltaEstimator.estimate(spark, current, red.superSeed, theta, roundSeed, model)
        else DeltaEstimator.estimateLocal(current, red.superSeed, theta, roundSeed, model)
      val x = Blocking.argmaxDelta(delta, v => !blocked(v) && notSeed(v))
      if (x < 0 || delta(x) <= 0.0) exhausted = true // nothing left to gain
      else { blocked(x) = true; order += x }
      i += 1
    }
    budgets.map(k => k -> order.take(k).toSeq).toMap
  }
}
