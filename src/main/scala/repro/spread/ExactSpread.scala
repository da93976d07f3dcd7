package repro.spread

import repro.graph.ProbGraph

/** Exact expected spread under the IC model by enumerating the outcomes of
  * every *uncertain* edge (0 < p < 1). Feasible only when the number of
  * uncertain edges is small (≤ [[MaxUncertain]]) — the same regime as the
  * exact BDD computation [39] the paper uses on its 100-vertex extracts.
  * Used as ground truth for the toy graph (Examples 1–2) and for verifying
  * the estimators.
  */
object ExactSpread {
  val MaxUncertain = 22

  /** Exact activation probability of every vertex with seed set `roots`,
    * optionally with blocked vertices (Definition 1 / Definition 2).
    * Seeds have probability 1 (unless blocked — seeds cannot be blocked in
    * the problem, but the math tolerates it by treating them as absent).
    */
  def activationProbs(
      g: ProbGraph,
      roots: Array[Int],
      blocked: Array[Boolean] = null): Array[Double] = {
    val uncertain = (0 until g.m).filter { e =>
      val p = g.probs(e)
      p > 0.0 && p < 1.0
    }.toArray
    require(
      uncertain.length <= MaxUncertain,
      s"${uncertain.length} uncertain edges exceed exact-enumeration limit $MaxUncertain")

    val probs = new Array[Double](g.n)
    val keepUncertain = new Array[Boolean](g.m)
    val nCombos = 1L << uncertain.length
    var combo = 0L
    while (combo < nCombos) {
      var worldP = 1.0
      var i = 0
      while (i < uncertain.length) {
        val e = uncertain(i)
        val on = ((combo >>> i) & 1L) == 1L
        keepUncertain(e) = on
        worldP *= (if (on) g.probs(e) else 1.0 - g.probs(e))
        i += 1
      }
      // Deterministic reachability in this world.
      val vis = new Array[Boolean](g.n)
      val stack = new Array[Int](g.n)
      var sp = 0
      var r = 0
      while (r < roots.length) {
        val s = roots(r)
        if (!vis(s) && (blocked == null || !blocked(s))) { vis(s) = true; stack(sp) = s; sp += 1 }
        r += 1
      }
      while (sp > 0) {
        sp -= 1
        val u = stack(sp)
        g.foreachOut(u) { (e, v, p) =>
          val live = p >= 1.0 || (p > 0.0 && keepUncertain(e))
          if (live && !vis(v) && (blocked == null || !blocked(v))) {
            vis(v) = true; stack(sp) = v; sp += 1
          }
        }
      }
      var v = 0
      while (v < g.n) { if (vis(v)) probs(v) += worldP; v += 1 }
      combo += 1
    }
    probs
  }

  /** Exact expected spread E(S, G) = Σ_u P(u, S) (Definition 3; seeds count
    * with probability 1).
    */
  def spread(g: ProbGraph, roots: Array[Int], blocked: Array[Boolean] = null): Double =
    activationProbs(g, roots, blocked).sum

  /** Exact spread after blocking `blockers` (E(S, G[V \ B])). */
  def spreadWithBlockers(g: ProbGraph, roots: Array[Int], blockers: Iterable[Int]): Double = {
    val mask = new Array[Boolean](g.n)
    blockers.foreach(mask(_) = true)
    spread(g, roots, mask)
  }
}
