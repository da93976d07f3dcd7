package repro.graph

/** The 9-vertex toy graph of Figure 1 of the paper, reconstructed exactly
  * from Examples 1–4 and the dominator trees of Figure 4:
  *
  *   v1 -> v2, v1 -> v4                      (p = 1)
  *   v2 -> v5, v4 -> v5                      (p = 1)
  *   v5 -> v3, v5 -> v6, v5 -> v9            (p = 1)
  *   v5 -> v8 (p = 0.5), v9 -> v8 (p = 0.2), v8 -> v7 (p = 0.1)
  *
  * With seed v1 this yields the paper's ground truth: E = 7.66,
  * P(v8) = 0.6, P(v7) = 0.06, and per-vertex blocking decreases
  * Δ(v5) = 4.66, Δ(v2) = Δ(v3) = Δ(v4) = Δ(v6) = 1, Δ(v8) = 0.66,
  * Δ(v9) = 1.11, Δ(v7) = 0.06 (Examples 1–2). Vertex `v{k}` is id `k-1`.
  */
object ToyGraph {
  val n = 9

  /** Id of `v{k}` (1-based paper name to 0-based id). */
  def v(k: Int): Int = k - 1

  val seed: Int = v(1)

  val edges: IndexedSeq[(Int, Int, Double)] = IndexedSeq(
    (v(1), v(2), 1.0),
    (v(1), v(4), 1.0),
    (v(2), v(5), 1.0),
    (v(4), v(5), 1.0),
    (v(5), v(3), 1.0),
    (v(5), v(6), 1.0),
    (v(5), v(9), 1.0),
    (v(5), v(8), 0.5),
    (v(9), v(8), 0.2),
    (v(8), v(7), 0.1),
  )

  def graph: ProbGraph = ProbGraph.fromEdges(n, edges)

  /** The paper's exact expected spread of the unblocked toy graph. */
  val expectedSpread = 7.66
}
