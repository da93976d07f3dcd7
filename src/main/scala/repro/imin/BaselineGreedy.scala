package repro.imin

import org.apache.spark.sql.SparkSession
import repro.graph.ProbGraph
import repro.sampling.GraphSampler
import repro.util.Rng
import scala.collection.mutable.ArrayBuffer

/** BaselineGreedy (Algorithm 1) — the state of the art the paper compares
  * against [2], [8]: in every round, re-estimate the expected spread of
  * blocking each candidate with Monte-Carlo Simulations and block the
  * vertex whose removal minimizes it. O(b·n·r·m) — this is the algorithm
  * AG beats by orders of magnitude while matching its choices.
  *
  * All candidates in a round share the same `r` sampled worlds (common
  * random numbers), which both reduces variance and makes BG's round-`i`
  * choice comparable to AG's estimate semantics.
  */
object BaselineGreedy {

  /** Run BG and return the blocker insertion order.
    *
    * @param distributed fan the candidate sweep out over a Spark job per
    *                    round (one task evaluates r simulations for a slice
    *                    of candidates)
    */
  def run(
      spark: SparkSession,
      g: ProbGraph,
      seeds: Set[Int],
      b: Int,
      r: Int,
      masterSeed: Long,
      distributed: Boolean = true): Seq[Int] = {
    require(b >= 1 && r >= 1, "b and r must be positive")
    val (red, notSeed) = Blocking.reduced(g, seeds)
    val rg = red.graph
    val superSeed = red.superSeed
    val blocked = new Array[Boolean](rg.n)
    val order = ArrayBuffer.empty[Int]

    // Candidates that can ever matter: vertices reachable from the seed in
    // the full-support graph (p > 0 edges). Others decrease nothing.
    val support = {
      val vis = new Array[Boolean](rg.n)
      val stack = new Array[Int](rg.n)
      var sp = 0
      vis(superSeed) = true; stack(0) = superSeed; sp = 1
      while (sp > 0) {
        sp -= 1
        val u = stack(sp)
        rg.foreachOut(u) { (_, v, p) =>
          if (p > 0.0 && !vis(v)) { vis(v) = true; stack(sp) = v; sp += 1 }
        }
      }
      vis
    }

    var i = 0
    var exhausted = false
    while (i < b && !exhausted) {
      val roundSeed = Rng.splitmix64(masterSeed ^ (i + 1).toLong)
      val candidates = (0 until rg.n).filter(v => support(v) && !blocked(v) && notSeed(v))
      if (candidates.isEmpty) exhausted = true
      else {
        val base = spreadSum(rg, superSeed, blocked, -1, r, roundSeed)
        val sums: Map[Int, Long] =
          if (distributed) {
            import spark.implicits._
            val bc = spark.sparkContext.broadcast((rg, blocked, superSeed))
            try {
              spark
                .createDataset(candidates)
                .mapPartitions { us =>
                  val (graph, blk, root) = bc.value
                  us.map(u => (u, spreadSum(graph, root, blk, u, r, roundSeed)))
                }
                .collect()
                .toMap
            } finally bc.destroy()
          } else candidates.map(u => u -> spreadSum(rg, superSeed, blocked, u, r, roundSeed)).toMap

        // Max decrease == min spread; deterministic tie-break by smallest id.
        val x = candidates.minBy(u => (sums(u), u))
        if (base - sums(x) <= 0L) exhausted = true
        else { blocked(x) = true; order += x }
      }
      i += 1
    }
    order.toSeq
  }

  /** Total reach count over `r` sampled worlds with `extraBlock` also
    * blocked (-1 for none).
    */
  private def spreadSum(
      g: ProbGraph,
      root: Int,
      blocked: Array[Boolean],
      extraBlock: Int,
      r: Int,
      roundSeed: Long): Long = {
    val mask =
      if (extraBlock < 0) blocked
      else {
        val m2 = blocked.clone(); m2(extraBlock) = true; m2
      }
    val roots = Array(root)
    var sum = 0L
    var i = 0L
    while (i < r) {
      sum += GraphSampler.reachCount(g, roots, Rng.sampleSeed(roundSeed, i), mask)
      i += 1
    }
    sum
  }
}
