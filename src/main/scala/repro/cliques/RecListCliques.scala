package repro.cliques

import repro.graph.{Adjacency, DirectedGraph}
import repro.par.Par

/** Parallel c-clique listing (paper Algorithm 1, after Shi et al. [60]).
  *
  * Cliques are grown along a low out-degree orientation: a candidate set of
  * common directed neighbors is intersected with the out-neighborhood of
  * each vertex added to the clique. With an O(α)-oriented DAG this lists
  * all c-cliques in O(mα^{c−2}) work.
  *
  * Parallelism is over root vertices ([[Par.forBlocked]]); each parallel
  * block gets its own consumer (from `consumerFactory`) and scratch
  * buffers, so consumers can accumulate thread-locally without contention.
  * The clique buffer passed to consumers is reused — copy it if you keep it.
  * Vertices appear in orientation (rank) order.
  */
object RecListCliques {

  /** Enumerates every k-clique of the oriented graph `dg` (k ≥ 1). */
  def foreachClique(dg: DirectedGraph, k: Int)(consumerFactory: () => Array[Int] => Unit): Unit = {
    require(k >= 1, s"clique size must be >= 1, got $k")
    if (dg.n == 0) return
    if (k == 1) {
      Par.forBlocked(0, dg.n) { (lo, hi) =>
        val f = consumerFactory()
        val buf = new Array[Int](1)
        var v = lo
        while (v < hi) { buf(0) = v; f(buf); v += 1 }
      }
      return
    }
    val maxD = math.max(1, dg.maxOutDegree)
    Par.forBlocked(0, dg.n, grain = 16) { (lo, hi) =>
      val f = consumerFactory()
      val clique = new Array[Int](k)
      val bufs = Array.ofDim[Int](math.max(1, k - 1), maxD)
      var v = lo
      while (v < hi) {
        clique(0) = v
        var len = 0
        var i = dg.offsets(v)
        val iHi = dg.offsets(v + 1)
        while (i < iHi) { bufs(0)(len) = dg.adj(i); len += 1; i += 1 }
        if (len >= k - 1) rec(dg, k - 1, 1, clique, bufs, 0, len, f)
        v += 1
      }
    }
  }

  /** Counts k-cliques (a foreachClique wrapper; one atomic add per clique,
    * which is fine at reproduction scales).
    */
  def countCliques(dg: DirectedGraph, k: Int): Long = {
    val acc = new java.util.concurrent.atomic.AtomicLong(0L)
    foreachClique(dg, k) { () => clique =>
      acc.incrementAndGet()
      val _ = clique
    }
    acc.get()
  }

  /** Sequentially counts the k-cliques rooted at each vertex drawn from
    * `roots` (a root's cliques are those whose orientation-minimal vertex it
    * is). Used by the Spark fan-out, where parallelism comes from the
    * partitioning rather than from [[repro.par.Par]].
    */
  def countFromRoots(dg: DirectedGraph, k: Int, roots: Iterator[Int]): Long = {
    require(k >= 1, s"clique size must be >= 1, got $k")
    if (k == 1) return roots.size.toLong
    val maxD = math.max(1, dg.maxOutDegree)
    val clique = new Array[Int](k)
    val bufs = Array.ofDim[Int](math.max(1, k - 1), maxD)
    var total = 0L
    val counter: Array[Int] => Unit = _ => total += 1
    while (roots.hasNext) {
      val v = roots.next()
      clique(0) = v
      var len = 0
      var i = dg.offsets(v)
      val iHi = dg.offsets(v + 1)
      while (i < iHi) { bufs(0)(len) = dg.adj(i); len += 1; i += 1 }
      if (len >= k - 1) rec(dg, k - 1, 1, clique, bufs, 0, len, counter)
    }
    total
  }

  /** Enumerates cliques of size `need` (≥ 1) drawn from the sorted candidate
    * set `cand(0 until candLen)` using directed adjacency, appending the
    * chosen vertices to `clique(baseLen until baseLen+need)` and invoking
    * `f(clique)` for each completion. This is UPDATE's use of Algorithm 1:
    * `cand` is the intersection of the undirected neighborhoods of a peeled
    * r-clique, and completions extend it to full s-cliques.
    */
  def foreachCompletion(
      dg: DirectedGraph,
      cand: Array[Int],
      candLen: Int,
      need: Int,
      clique: Array[Int],
      baseLen: Int,
      bufs: Array[Array[Int]]
  )(f: Array[Int] => Unit): Unit = {
    require(need >= 1, s"need must be >= 1, got $need")
    if (need == 1) {
      var i = 0
      while (i < candLen) { clique(baseLen) = cand(i); f(clique); i += 1 }
      return
    }
    var i = 0
    while (i < candLen) {
      val u = cand(i)
      clique(baseLen) = u
      val nl = dg.intersectOut(cand, candLen, u, bufs(0))
      if (nl >= need - 1) recCompletion(dg, need - 1, baseLen + 1, clique, bufs, 0, nl, f)
      i += 1
    }
  }

  private def recCompletion(
      dg: DirectedGraph,
      rl: Int,
      depth: Int,
      clique: Array[Int],
      bufs: Array[Array[Int]],
      bufIdx: Int,
      candLen: Int,
      f: Array[Int] => Unit
  ): Unit = {
    val cand = bufs(bufIdx)
    if (rl == 1) {
      var i = 0
      while (i < candLen) { clique(depth) = cand(i); f(clique); i += 1 }
      return
    }
    var i = 0
    while (i < candLen) {
      val u = cand(i)
      clique(depth) = u
      val nl = dg.intersectOut(cand, candLen, u, bufs(bufIdx + 1))
      if (nl >= rl - 1) recCompletion(dg, rl - 1, depth + 1, clique, bufs, bufIdx + 1, nl, f)
      i += 1
    }
  }

  private def rec(
      dg: DirectedGraph,
      rl: Int,
      depth: Int,
      clique: Array[Int],
      bufs: Array[Array[Int]],
      bufIdx: Int,
      candLen: Int,
      f: Array[Int] => Unit
  ): Unit = {
    val cand = bufs(bufIdx)
    if (rl == 1) {
      var i = 0
      while (i < candLen) { clique(depth) = cand(i); f(clique); i += 1 }
      return
    }
    var i = 0
    while (i < candLen) {
      val u = cand(i)
      clique(depth) = u
      val nl = dg.intersectOut(cand, candLen, u, bufs(bufIdx + 1))
      if (nl >= rl - 1) rec(dg, rl - 1, depth + 1, clique, bufs, bufIdx + 1, nl, f)
      i += 1
    }
  }
}

/** Sorted-adjacency set intersection helpers (paper §3 parallel hash-table
  * intersections; the practical implementation intersects sorted arrays).
  */
object Intersect {

  /** Writes the common undirected neighbors of `vs(0 until len)` into `out`
    * (sorted ascending) and returns the count. Starts from the
    * minimum-degree member — the Lemma 4.1 accounting — and filters via
    * galloping binary search in the others' adjacency lists.
    */
  def commonNeighbors(g: Adjacency, vs: Array[Int], len: Int, out: Array[Int]): Int = {
    require(len >= 1, "need at least one vertex")
    var minI = 0
    var i = 1
    while (i < len) { if (g.degree(vs(i)) < g.degree(vs(minI))) minI = i; i += 1 }
    val pivot = vs(minI)
    var k = 0
    g.foreachNeighbor(pivot) { w =>
      var ok = true
      var j = 0
      while (ok && j < len) {
        if (j != minI && !(g.hasEdge(vs(j), w) || vs(j) == w)) ok = false
        j += 1
      }
      // w must be a neighbor of every vs(j); w == vs(j) is impossible since
      // simple graphs have no self loops, so exclude it explicitly.
      if (ok) {
        var member = false
        var t = 0
        while (t < len) { if (vs(t) == w) member = true; t += 1 }
        if (!member) { out(k) = w; k += 1 }
      }
    }
    k
  }
}
