package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Immutable directed graph with a propagation probability on every edge,
  * stored in CSR (compressed sparse row) form over vertex ids `0 until n`.
  *
  * This is the local substrate every algorithm kernel runs on: the graph is
  * broadcast to executors and each task walks the CSR arrays directly. The
  * canonical distributed form is the edge `DataFrame(src, dst, p)` produced
  * by [[toDF]] / consumed by [[ProbGraph.fromDF]].
  *
  * @param offsets CSR row offsets, size `n + 1`
  * @param targets edge targets grouped by source, size `m`
  * @param probs   per-edge propagation probability, aligned with `targets`
  */
final class ProbGraph private[graph] (
    val n: Int,
    val offsets: Array[Int],
    val targets: Array[Int],
    val probs: Array[Double])
    extends Serializable {

  require(offsets.length == n + 1, s"offsets length ${offsets.length} != n+1")
  require(targets.length == probs.length, "targets/probs length mismatch")

  /** Number of directed edges. */
  def m: Int = targets.length

  /** Out-degree of vertex `u`. */
  def outDegree(u: Int): Int = offsets(u + 1) - offsets(u)

  /** Out-neighbors of `u` (targets of its edges, duplicates preserved). */
  def outNeighbors(u: Int): IndexedSeq[Int] =
    (offsets(u) until offsets(u + 1)).map(targets)

  /** Apply `f(edgeIdx, target, prob)` to every out-edge of `u`. */
  @inline def foreachOut(u: Int)(f: (Int, Int, Double) => Unit): Unit = {
    var e = offsets(u)
    val end = offsets(u + 1)
    while (e < end) { f(e, targets(e), probs(e)); e += 1 }
  }

  /** In-degree of every vertex (computed once, cached). */
  lazy val inDegrees: Array[Int] = {
    val d = new Array[Int](n)
    var e = 0
    while (e < m) { d(targets(e)) += 1; e += 1 }
    d
  }

  /** All edges as `(src, dst, p)` triples in CSR order. */
  def edgeTriples: IndexedSeq[(Int, Int, Double)] =
    for { u <- 0 until n; e <- offsets(u) until offsets(u + 1) }
      yield (u, targets(e), probs(e))

  /** The reverse graph (every edge flipped, probabilities preserved). */
  def reverse: ProbGraph =
    ProbGraph.fromEdges(n, edgeTriples.map { case (u, v, p) => (v, u, p) })

  /** The graph after blocking `blocked` vertices: every edge incident to a
    * blocked vertex is removed (Definition 2 sets incoming probabilities to
    * 0; outgoing edges of a blocker can never fire because it is never
    * activated, so dropping both sides equals `G[V \ B]` for spread).
    * Vertex ids are preserved.
    */
  def blockVertices(blocked: Array[Boolean]): ProbGraph = {
    require(blocked.length == n, "blocked mask must have length n")
    val kept = edgeTriples.filter { case (u, v, _) => !blocked(u) && !blocked(v) }
    ProbGraph.fromEdges(n, kept)
  }

  /** Same graph with probabilities replaced by `f(edgeIdx, src, dst)`. */
  def mapProbs(f: (Int, Int, Int) => Double): ProbGraph = {
    val p2 = new Array[Double](m)
    var u = 0
    while (u < n) {
      var e = offsets(u)
      while (e < offsets(u + 1)) { p2(e) = f(e, u, targets(e)); e += 1 }
      u += 1
    }
    new ProbGraph(n, offsets, targets, p2)
  }

  /** Canonical distributed form: `DataFrame(src: int, dst: int, p: double)`. */
  def toDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    edgeTriples.toDF("src", "dst", "p")
  }
}

object ProbGraph {

  /** Build a CSR graph from edge triples (any order; order within a source
    * is preserved from the input, making construction deterministic).
    */
  def fromEdges(n: Int, edges: Iterable[(Int, Int, Double)]): ProbGraph = {
    val m = edges.size
    val counts = new Array[Int](n + 1)
    edges.foreach { case (u, v, p) =>
      require(u >= 0 && u < n && v >= 0 && v < n, s"edge ($u,$v) out of range n=$n")
      require(p >= 0.0 && p <= 1.0, s"probability $p outside [0,1] on ($u,$v)")
      counts(u + 1) += 1
    }
    var i = 0
    while (i < n) { counts(i + 1) += counts(i); i += 1 }
    val offsets = counts.clone()
    val targets = new Array[Int](m)
    val probs = new Array[Double](m)
    val cursor = counts.clone()
    edges.foreach { case (u, v, p) =>
      val pos = cursor(u); cursor(u) += 1
      targets(pos) = v; probs(pos) = p
    }
    new ProbGraph(n, offsets, targets, probs)
  }

  /** Rebuild a local CSR graph from its canonical edge DataFrame. */
  def fromDF(df: DataFrame, n: Int): ProbGraph = {
    val rows = df.select("src", "dst", "p").collect()
    fromEdges(n, rows.toIndexedSeq.map(r => (r.getInt(0), r.getInt(1), r.getDouble(2))))
  }
}
