package repro.imin

import repro.graph.{ProbGraph, SeedReduction}

/** Shared plumbing for the blocker-selection algorithms. */
object Blocking {

  /** Boolean mask over `n` vertices from a blocker collection. */
  def maskOf(n: Int, blockers: Iterable[Int]): Array[Boolean] = {
    val mask = new Array[Boolean](n)
    blockers.foreach(mask(_) = true)
    mask
  }

  /** Deterministic argmax of `delta` over vertices satisfying `allowed`:
    * largest delta, ties broken by smallest id; -1 when nothing is allowed.
    */
  def argmaxDelta(delta: Array[Double], allowed: Int => Boolean): Int = {
    var best = -1
    var v = 0
    while (v < delta.length) {
      if (allowed(v) && (best == -1 || delta(v) > delta(best))) best = v
      v += 1
    }
    best
  }

  /** Reduce to a single-seed instance and build the candidate filter: the
    * unified seed and the (now isolated) original seeds are never blockable.
    */
  def reduced(g: ProbGraph, seeds: Set[Int]): (SeedReduction.Reduced, Int => Boolean) = {
    val red = SeedReduction.reduce(g, seeds)
    val notSeed = (v: Int) => v != red.superSeed && !seeds.contains(v)
    (red, notSeed)
  }
}
