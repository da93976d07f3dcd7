package repro.graph

/** The multi-seed → single-seed reduction of Section V of the paper.
  *
  * A unified seed `s'` replaces all seeds: for every non-seed vertex `u`
  * receiving edges from `h` seeds with probabilities `p_1..p_h`, those edges
  * are removed and one edge `s' -> u` with probability `1 - prod(1 - p_i)`
  * is added. Because an active vertex in the IC model has exactly one chance
  * to activate each out-neighbor, this preserves the distribution of the
  * spread over the non-seed vertices, and the optimal blocker set is
  * unchanged.
  */
object SeedReduction {

  /** Result of the reduction.
    *
    * @param graph     reduced graph over `g.n + 1` vertices; original ids are
    *                  preserved, the unified seed is vertex `superSeed = g.n`;
    *                  the original seeds become isolated vertices
    * @param superSeed id of the unified seed `s'`
    * @param seeds     the original seed set
    */
  final case class Reduced(graph: ProbGraph, superSeed: Int, seeds: Set[Int]) {

    /** Spread in original-graph accounting: the paper's E(S, G) counts every
      * seed with probability 1, while the reduced graph counts the single
      * `s'`; so `E_orig = |S| + (E_reduced - 1)`.
      */
    def toOriginalSpread(reducedSpread: Double): Double =
      seeds.size + (reducedSpread - 1.0)
  }

  /** Reduce `(g, seeds)` to a single-seed instance. */
  def reduce(g: ProbGraph, seeds: Set[Int]): Reduced = {
    require(seeds.nonEmpty, "seed set must be non-empty")
    seeds.foreach(s => require(s >= 0 && s < g.n, s"seed $s out of range"))
    val isSeed = new Array[Boolean](g.n)
    seeds.foreach(isSeed(_) = true)
    val superSeed = g.n

    // 1 - prod(1 - p_i) per target of any seed edge, accumulated as the
    // "miss" product to stay numerically simple.
    val missProduct = new Array[Double](g.n)
    java.util.Arrays.fill(missProduct, 1.0)
    val touched = scala.collection.mutable.ArrayBuffer.empty[Int]

    val kept = scala.collection.mutable.ArrayBuffer.empty[(Int, Int, Double)]
    for ((u, v, p) <- g.edgeTriples) {
      if (isSeed(u)) {
        if (!isSeed(v)) { // seed -> non-seed folds into the s' edge
          if (missProduct(v) == 1.0) touched += v
          missProduct(v) *= (1.0 - p)
        } // seed -> seed is irrelevant: seeds are already active
      } else if (!isSeed(v)) {
        kept += ((u, v, p)) // edges into seeds cannot change any state
      }
    }
    for (v <- touched.sorted) {
      val p = 1.0 - missProduct(v)
      if (p > 0.0) kept += ((superSeed, v, p))
    }
    Reduced(ProbGraph.fromEdges(g.n + 1, kept), superSeed, seeds)
  }
}
