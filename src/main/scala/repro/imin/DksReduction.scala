package repro.imin

import repro.graph.ProbGraph

/** The reduction from Densest-k-Subgraph used in the NP-/APX-hardness
  * proofs (Theorems 1 and 3, Figure 2), built concretely so the equivalence
  * can be *tested*: blocking the C-vertices of a DKS vertex set `A`
  * decreases the expected spread by exactly `|A| + edges(G[A])`.
  */
object DksReduction {

  /** The constructed IMIN instance.
    *
    * @param graph IMIN graph `G'` with all propagation probabilities 1
    * @param seed  the unique seed vertex `S`
    * @param cIds  ids of the C-part (`cIds(i)` corresponds to DKS vertex i)
    * @param dIds  ids of the D-part (`dIds(j)` corresponds to DKS edge j)
    */
  final case class Instance(graph: ProbGraph, seed: Int, cIds: Range, dIds: Range)

  /** Build `G'` from an undirected DKS instance on `n` vertices. */
  def build(n: Int, undirectedEdges: Seq[(Int, Int)]): Instance = {
    val m = undirectedEdges.length
    val cIds = 0 until n
    val dIds = n until (n + m)
    val seed = n + m
    val edges = Seq.newBuilder[(Int, Int, Double)]
    cIds.foreach(c => edges += ((seed, c, 1.0)))
    undirectedEdges.zipWithIndex.foreach { case ((x, y), j) =>
      require(x != y && x < n && y < n, s"bad DKS edge ($x,$y)")
      edges += ((cIds(x), dIds(j), 1.0))
      edges += ((cIds(y), dIds(j), 1.0))
    }
    Instance(ProbGraph.fromEdges(n + m + 1, edges.result()), seed, cIds, dIds)
  }

  /** Number of DKS edges induced by vertex set `a` — the quantity the
    * spread decrease encodes.
    */
  def inducedEdges(undirectedEdges: Seq[(Int, Int)], a: Set[Int]): Int =
    undirectedEdges.count { case (x, y) => a.contains(x) && a.contains(y) }
}
