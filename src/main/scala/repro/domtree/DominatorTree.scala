package repro.domtree

import repro.graph.ProbGraph

/** Dominator trees via the Lengauer–Tarjan algorithm [53] (the "simple"
  * eval/link variant with path compression, O(m log n)).
  *
  * The tree is computed for the subgraph of `g` induced by an edge predicate
  * (the live edges of one sampled world) restricted to the vertices
  * reachable from `root` — exactly what Algorithm 2 of the paper needs. All
  * internal state lives in DFS-number ("dfn") space; [[Result]] exposes both
  * the compact dfn-space arrays (for the subtree-size scan) and an
  * original-id view (for tests).
  */
object DominatorTree {

  /** Dominator tree of one (sampled) graph.
    *
    * @param count    number of vertices reachable from the root
    * @param vertexOf original vertex id of each dfn in `0 until count`
    * @param idomDfn  immediate dominator in dfn space; `idomDfn(0) == 0`
    */
  final class Result(
      val count: Int,
      val vertexOf: Array[Int],
      private val dfnOf: Array[Int],
      val idomDfn: Array[Int]) {

    /** Is original vertex `v` reachable from the root? */
    def reachable(v: Int): Boolean = dfnOf(v) >= 0

    /** Immediate dominator of original vertex `v`; the root maps to itself;
      * -1 if `v` is unreachable.
      */
    def idomOf(v: Int): Int = {
      val d = dfnOf(v)
      if (d < 0) -1 else vertexOf(idomDfn(d))
    }

    /** Size of the dominator-tree subtree rooted at each dfn (Theorem 6:
      * this equals σ→u(s, g), the number of vertices whose every path from
      * the root passes through u). The root's entry is `count`.
      */
    def subtreeSizes: Array[Int] = {
      val size = Array.fill(count)(1)
      // idom is always a DFS-tree ancestor, so idomDfn(w) < w and one
      // reverse scan accumulates children before parents.
      var w = count - 1
      while (w >= 1) { size(idomDfn(w)) += size(w); w -= 1 }
      size
    }

    /** Subtree size of original vertex `v` (0 if unreachable). */
    def subtreeSizeOf(v: Int): Int = {
      val sizes = subtreeSizes
      val d = dfnOf(v)
      if (d < 0) 0 else sizes(d)
    }
  }

  /** Compute the dominator tree of the subgraph of `g` whose edges satisfy
    * `keepEdge`, restricted to vertices reachable from `root`.
    */
  def compute(g: ProbGraph, root: Int, keepEdge: Int => Boolean): Result = {
    val n = g.n
    val dfn = new Array[Int](n)
    java.util.Arrays.fill(dfn, -1)
    val vertexOf = new Array[Int](n)
    val parent = new Array[Int](n) // dfn space

    // --- Step 1: iterative DFS numbering over live edges --------------------
    val stackV = new Array[Int](n)
    val stackE = new Array[Int](n)
    var sp = 0
    var cnt = 0
    dfn(root) = cnt; vertexOf(cnt) = root; parent(0) = 0; cnt += 1
    stackV(0) = root; stackE(0) = g.offsets(root); sp = 1
    while (sp > 0) {
      val u = stackV(sp - 1)
      var e = stackE(sp - 1)
      val end = g.offsets(u + 1)
      var descended = false
      while (e < end && !descended) {
        val v = g.targets(e)
        if (keepEdge(e) && dfn(v) < 0) {
          stackE(sp - 1) = e + 1
          dfn(v) = cnt; vertexOf(cnt) = v; parent(cnt) = dfn(u); cnt += 1
          stackV(sp) = v; stackE(sp) = g.offsets(v); sp += 1
          descended = true
        }
        e += 1
      }
      if (!descended) { stackE(sp - 1) = e; sp -= 1 }
    }

    // --- Predecessor lists in dfn space (CSR over live edges) ---------------
    val predOff = new Array[Int](cnt + 1)
    var i = 0
    while (i < cnt) {
      val u = vertexOf(i)
      g.foreachOut(u) { (e, v, _) =>
        if (keepEdge(e) && dfn(v) >= 0) predOff(dfn(v) + 1) += 1
      }
      i += 1
    }
    i = 0
    while (i < cnt) { predOff(i + 1) += predOff(i); i += 1 }
    val predSrc = new Array[Int](predOff(cnt))
    val cursor = predOff.clone()
    i = 0
    while (i < cnt) {
      val u = vertexOf(i)
      g.foreachOut(u) { (e, v, _) =>
        if (keepEdge(e) && dfn(v) >= 0) {
          val w = dfn(v)
          predSrc(cursor(w)) = i; cursor(w) += 1
        }
      }
      i += 1
    }

    // --- Steps 2-4: Lengauer-Tarjan with path compression -------------------
    val semi = new Array[Int](cnt)
    val label = new Array[Int](cnt)
    val ancestor = new Array[Int](cnt)
    val dom = new Array[Int](cnt)
    val bucketHead = new Array[Int](cnt)
    val bucketNext = new Array[Int](cnt)
    i = 0
    while (i < cnt) {
      semi(i) = i; label(i) = i; ancestor(i) = -1
      bucketHead(i) = -1; bucketNext(i) = -1
      i += 1
    }

    val chain = new Array[Int](cnt)
    def eval(v0: Int): Int = {
      if (ancestor(v0) < 0) v0
      else {
        // COMPRESS(v0): collect the chain of vertices whose grandparent in
        // the link forest exists, then relabel top-down.
        var len = 0
        var x = v0
        while (ancestor(ancestor(x)) >= 0) { chain(len) = x; len += 1; x = ancestor(x) }
        while (len > 0) {
          len -= 1
          val y = chain(len)
          val a = ancestor(y)
          if (semi(label(a)) < semi(label(y))) label(y) = label(a)
          ancestor(y) = ancestor(a)
        }
        label(v0)
      }
    }

    var w = cnt - 1
    while (w >= 1) {
      val p = parent(w)
      // Step 2: semidominator of w.
      var j = predOff(w)
      while (j < predOff(w + 1)) {
        val u = eval(predSrc(j))
        if (semi(u) < semi(w)) semi(w) = semi(u)
        j += 1
      }
      bucketNext(w) = bucketHead(semi(w)); bucketHead(semi(w)) = w
      ancestor(w) = p // LINK(parent(w), w)
      // Step 3: implicitly define idom for the bucket of parent(w).
      var v = bucketHead(p)
      bucketHead(p) = -1
      while (v >= 0) {
        val nx = bucketNext(v)
        val u = eval(v)
        dom(v) = if (semi(u) < semi(v)) u else p
        v = nx
      }
      w -= 1
    }
    // Step 4: explicit immediate dominators.
    dom(0) = 0
    w = 1
    while (w < cnt) {
      if (dom(w) != semi(w)) dom(w) = dom(dom(w))
      w += 1
    }

    new Result(cnt, java.util.Arrays.copyOf(vertexOf, cnt), dfn, dom)
  }

  /** Dominator tree of the whole graph (every edge live). */
  def computeAll(g: ProbGraph, root: Int): Result = compute(g, root, _ => true)

  /** O(n·m) brute-force immediate dominators, for verification: `u`
    * dominates `v` iff `v` is unreachable from `root` once `u` is removed;
    * the immediate dominator is the deepest proper dominator.
    * Returns idom per original vertex id (root -> root, unreachable -> -1).
    */
  def bruteForceIdoms(g: ProbGraph, root: Int, keepEdge: Int => Boolean = _ => true): Array[Int] = {
    def reach(skip: Int): Array[Boolean] = {
      val vis = new Array[Boolean](g.n)
      if (root == skip) return vis
      val stack = new java.util.ArrayDeque[Integer]()
      vis(root) = true; stack.push(root)
      while (!stack.isEmpty) {
        val u = stack.pop().intValue()
        g.foreachOut(u) { (e, v, _) =>
          if (keepEdge(e) && v != skip && !vis(v)) { vis(v) = true; stack.push(v) }
        }
      }
      vis
    }
    val base = reach(-1)
    val doms = Array.fill(g.n)(Set.empty[Int])
    for (v <- 0 until g.n if base(v)) doms(v) = Set(v)
    for (u <- 0 until g.n if base(u)) {
      val without = reach(u)
      for (v <- 0 until g.n if base(v) && !without(v)) doms(v) += u
    }
    val idom = Array.fill(g.n)(-1)
    idom(root) = root
    for (v <- 0 until g.n if base(v) && v != root) {
      val proper = doms(v) - v
      idom(v) = proper.maxBy(d => doms(d).size) // dominators form a chain
    }
    idom
  }
}
