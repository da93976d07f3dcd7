package repro.imin

import org.apache.spark.sql.SparkSession
import repro.graph.ProbGraph
import repro.sampling.GraphSampler
import repro.util.Rng

/** The Exact baseline of §VI-A: enumerate *every* blocker set of size `b`
  * and keep the one with the smallest expected spread.
  *
  * Spread of each candidate set is evaluated on a fixed pool of `thetaEval`
  * sampled worlds keyed by `masterSeed` — common random numbers, so the
  * comparison between candidate sets (and later against GR) is exact on the
  * sampled measure, mirroring the paper's exact-spread evaluation [39] of
  * its small extracts. The `C(candidates, b)` combinations are unranked
  * combinatorially and fanned out over a `spark.range` of combination
  * indices.
  */
object ExactBlocker extends Serializable {

  /** Binomial coefficient with saturation (inputs here stay tiny). */
  def choose(n: Int, r: Int): Long = {
    if (r < 0 || r > n) return 0L
    var acc = 1L
    var i = 0
    while (i < math.min(r, n - r)) {
      acc = acc * (n - i) / (i + 1)
      i += 1
    }
    acc
  }

  /** Colexicographic unranking: the `idx`-th `b`-subset of `0 until k`,
    * as positions into the candidate array.
    */
  def unrank(idx: Long, b: Int): Array[Int] = {
    val out = new Array[Int](b)
    var rem = idx
    var j = b
    while (j >= 1) {
      var c = j - 1
      while (choose(c + 1, j) <= rem) c += 1
      out(j - 1) = c
      rem -= choose(c, j)
      j -= 1
    }
    out
  }

  /** Exhaustive search over all `b`-subsets of the blockable candidates.
    *
    * Candidates are the non-seed vertices reachable from the seeds through
    * positive-probability edges — blocking anything else decreases nothing,
    * so the restriction preserves the optimal spread value.
    *
    * @return (optimal blocker set, its estimated spread under the fixed pool)
    */
  def run(
      spark: SparkSession,
      g: ProbGraph,
      seeds: Set[Int],
      b: Int,
      thetaEval: Int,
      masterSeed: Long,
      distributed: Boolean = true): (Seq[Int], Double) = {
    require(b >= 1 && thetaEval >= 1, "b and thetaEval must be positive")
    val roots = seeds.toArray.sorted
    val support = {
      val vis = new Array[Boolean](g.n)
      val stack = new Array[Int](g.n)
      var sp = 0
      roots.foreach { s => if (!vis(s)) { vis(s) = true; stack(sp) = s; sp += 1 } }
      while (sp > 0) {
        sp -= 1
        val u = stack(sp)
        g.foreachOut(u) { (_, v, p) =>
          if (p > 0.0 && !vis(v)) { vis(v) = true; stack(sp) = v; sp += 1 }
        }
      }
      vis
    }
    val candidates = (0 until g.n).filter(v => support(v) && !seeds.contains(v)).toArray
    val bEff = math.min(b, candidates.length)
    require(bEff >= 1, "no blockable candidate is reachable from the seeds")
    val nCombos = choose(candidates.length, bEff)

    def evalCombo(idx: Long, graph: ProbGraph, rs: Array[Int]): (Long, Long) = {
      val positions = unrank(idx, bEff)
      val mask = new Array[Boolean](graph.n)
      positions.foreach(p => mask(candidates(p)) = true)
      var sum = 0L
      var i = 0L
      while (i < thetaEval) {
        sum += GraphSampler.reachCount(graph, rs, Rng.sampleSeed(masterSeed, i), mask)
        i += 1
      }
      (sum, idx)
    }

    val (bestSum, bestIdx) =
      if (distributed) {
        import spark.implicits._
        val bc = spark.sparkContext.broadcast((g, roots))
        try {
          spark
            .range(nCombos)
            .as[Long]
            .mapPartitions { idxs =>
              val (graph, rs) = bc.value
              var best: (Long, Long) = null
              idxs.foreach { idx =>
                val r = evalCombo(idx, graph, rs)
                if (best == null || r._1 < best._1 || (r._1 == best._1 && r._2 < best._2)) best = r
              }
              if (best == null) Iterator.empty else Iterator.single(best)
            }
            .collect()
            .minBy(identity)
        } finally bc.destroy()
      } else
        (0L until nCombos).map(evalCombo(_, g, roots)).minBy(identity)

    val blockers = unrank(bestIdx, bEff).map(candidates(_)).toSeq
    (blockers, bestSum.toDouble / thetaEval)
  }
}
