package repro.baselines

import repro.graph.CSRGraph

/** Brute-force reference (r,s) nucleus decomposition — the correctness
  * oracle for every other implementation in this repository.
  *
  * Deliberately independent of the orientation/intersection machinery:
  * cliques are enumerated by growing increasing-id vertex sets with
  * pairwise adjacency checks, and peeling materializes the full r-clique ↔
  * s-clique incidence. Exponential-ish and memory-hungry, so only for
  * small test graphs.
  *
  * Peeling semantics match ARB-NUCLEUS-DECOMP exactly (including the round
  * accounting): each round peels all r-cliques whose frontier-clamped count
  * equals the current minimum; an s-clique dies when any of its r-subsets
  * is peeled; surviving subsets lose one count per dead s-clique.
  */
object RefNucleus {

  final case class RefResult(
      coreMap: Map[Seq[Int], Long],
      rounds: Int,
      numRCliques: Long,
      numSCliques: Long
  ) {
    def maxCore: Long = if (coreMap.isEmpty) -1L else coreMap.values.max
  }

  /** All k-cliques as sorted vertex arrays (brute force). */
  def allCliques(g: CSRGraph, k: Int): Array[Array[Int]] = {
    val out = Array.newBuilder[Array[Int]]
    val cur = new Array[Int](k)
    def rec(pos: Int, start: Int): Unit = {
      if (pos == k) { out += cur.clone(); return }
      var v = start
      while (v < g.n) {
        var ok = true
        var j = 0
        while (ok && j < pos) { if (!g.hasEdge(cur(j), v)) ok = false; j += 1 }
        if (ok) {
          cur(pos) = v
          rec(pos + 1, v + 1)
        }
        v += 1
      }
    }
    rec(0, 0)
    out.result()
  }

  def decompose(g: CSRGraph, r: Int, s: Int): RefResult = {
    require(r >= 1 && s > r, s"need 1 <= r < s, got r=$r s=$s")
    val rCliques = allCliques(g, r)
    val sCliques = allCliques(g, s)
    val idOf = rCliques.zipWithIndex.map { case (c, i) => c.toSeq -> i }.toMap
    val numR = rCliques.length

    // incidence: s-clique -> ids of its r-subsets
    val subsets: Array[Array[Int]] = sCliques.map { sc =>
      sc.toSeq.combinations(r).map(c => idOf(c)).toArray
    }
    val counts = new Array[Long](numR)
    subsets.foreach(_.foreach(id => counts(id) += 1))

    val peeled = new Array[Boolean](numR)
    val sAlive = Array.fill(subsets.length)(true)
    val core = new Array[Long](numR)
    var alive = numR
    var kCur = 0L
    var rounds = 0

    while (alive > 0) {
      var minClamped = Long.MaxValue
      var i = 0
      while (i < numR) {
        if (!peeled(i)) {
          val c = math.max(counts(i), kCur)
          if (c < minClamped) minClamped = c
        }
        i += 1
      }
      val k = minClamped
      val peelSet = new scala.collection.mutable.ArrayBuffer[Int]()
      i = 0
      while (i < numR) {
        if (!peeled(i) && math.max(counts(i), kCur) == k) peelSet += i
        i += 1
      }
      rounds += 1
      kCur = k
      peelSet.foreach { id => peeled(id) = true; core(id) = k; alive -= 1 }
      // kill s-cliques containing a peeled subset; decrement survivors
      var sc = 0
      while (sc < subsets.length) {
        if (sAlive(sc) && subsets(sc).exists(peeled)) {
          sAlive(sc) = false
          subsets(sc).foreach { id => if (!peeled(id)) counts(id) -= 1 }
        }
        sc += 1
      }
    }

    val coreMap = rCliques.zipWithIndex.map { case (c, i) => c.toSeq -> core(i) }.toMap
    RefResult(coreMap, rounds, numR.toLong, sCliques.length.toLong)
  }
}
