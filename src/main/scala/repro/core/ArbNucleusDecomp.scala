package repro.core

import java.util.concurrent.atomic.LongAdder
import repro.cliques.{CliqueEncoding, Intersect, RecListCliques}
import repro.graph.{Adjacency, CSRGraph, DirectedGraph, Orientation, PeelableGraph}
import repro.par.Par

/** Phase timings and work counters of one decomposition run. */
final case class NucleusStats(
    rounds: Int,
    numRCliques: Long,
    numSCliques: Long,
    updateScliqueDiscoveries: Long,
    contractions: Int,
    tOrientMs: Double,
    tListMs: Double,
    tBuildMs: Double,
    tCountMs: Double,
    tPeelMs: Double,
    tableMemory: TableMemory
) {
  def totalMs: Double = tOrientMs + tListMs + tBuildMs + tCountMs + tPeelMs
  /** s-cliques touched across the whole run: initial count + re-discoveries
    * during peeling (the metric the paper compares against AND/AND-NN).
    */
  def totalScliqueDiscoveries: Long = numSCliques + updateScliqueDiscoveries
}

/** Output of ARB-NUCLEUS-DECOMP: the (r,s)-clique core number of every
  * r-clique, addressed by its slot in the clique table. If the graph was
  * relabeled, `oldOf` translates table vertex ids back to input ids.
  */
final class NucleusResult(
    val r: Int,
    val s: Int,
    val table: CliqueTable,
    val core: Array[Long],
    val oldOf: Array[Int],
    val stats: NucleusStats
) {
  def maxCore: Long = {
    var mx = -1L
    table.foreachOccupied { slot => if (core(slot) > mx) mx = core(slot) }
    mx
  }

  /** Materializes clique (original vertex ids, sorted) → core number. */
  def coreMap: Map[Seq[Int], Long] = {
    val out = Map.newBuilder[Seq[Int], Long]
    val buf = new Array[Int](r)
    table.foreachOccupied { slot =>
      table.cliqueOf(slot, buf)
      val verts =
        if (oldOf == null) buf.take(r).toSeq
        else buf.take(r).map(oldOf).sorted.toSeq
      out += verts -> core(slot)
    }
    out.result()
  }

  /** Histogram core value → number of r-cliques (cheap result fingerprint). */
  def coreHistogram: Map[Long, Long] = {
    val m = scala.collection.mutable.Map.empty[Long, Long]
    table.foreachOccupied { slot => m.updateWith(core(slot)) { c => Some(c.getOrElse(0L) + 1) } }
    m.toMap
  }
}

/** ARB-NUCLEUS-DECOMP (paper Algorithm 2): parallel (r,s) nucleus
  * decomposition by bucketed peeling of r-cliques ordered by incident
  * s-clique count, with s-clique counts maintained in a (multi-level)
  * clique hash table and updated via REC-LIST-CLIQUES completions.
  *
  * One deliberate deviation from the pseudocode: instead of atomically
  * subtracting the fraction 1/a from each surviving subset (a = number of
  * simultaneously peeled r-subsets of the s-clique), the peeled subset with
  * the minimum slot performs the full −1 decrement. Both schemes enumerate
  * the peeled subsets anyway (the paper's line 7 computes a), end-of-round
  * counts are identical, and integer atomics avoid floating-point hazards.
  * See DESIGN.md "Fidelity substitutions".
  */
object ArbNucleusDecomp {

  def decompose(
      g: CSRGraph,
      r: Int,
      s: Int,
      config: NucleusConfig = null
  ): NucleusResult = {
    require(r >= 1 && s > r, s"need 1 <= r < s, got r=$r s=$s")
    val cfg = if (config == null) NucleusConfig.optimal(r, s, g.n) else config

    // --- orientation (+ optional relabeling, §5.4) -------------------------
    var t0 = System.nanoTime()
    val (workGraph, dg, oldOf) =
      if (cfg.relabel) {
        val (rg, rdg, old) = Orientation.relabelByRank(g, cfg.order)
        (rg, rdg, old)
      } else {
        (g, Orientation.orient(g, cfg.order), null: Array[Int])
      }
    val tOrient = msSince(t0)

    // --- list r-cliques, sorted lexicographically --------------------------
    t0 = System.nanoTime()
    val (cliquesFlat, numR) = listSortedCliques(dg, r, sortNeeded = !cfg.relabel, g.n)
    val tList = msSince(t0)

    // --- build T (§5.1–5.3) -------------------------------------------------
    t0 = System.nanoTime()
    val table = CliqueTable.build(cliquesFlat, numR, r, workGraph.n, cfg.scheme, cfg.contiguous, cfg.inverse)
    val tBuild = msSince(t0)

    // --- count s-cliques per r-clique ---------------------------------------
    t0 = System.nanoTime()
    val combos = Util.combinations(s, r)
    RecListCliques.foreachClique(dg, s) { () =>
      val sBuf = new Array[Int](s)
      val subBuf = new Array[Int](r)
      clique => {
        System.arraycopy(clique, 0, sBuf, 0, s)
        if (!cfg.relabel) Util.insertionSort(sBuf, s)
        var j = 0
        while (j < combos.length) {
          val combo = combos(j)
          var t = 0
          while (t < r) { subBuf(t) = sBuf(combo(t)); t += 1 }
          val slot = table.slotOf(subBuf)
          table.addCount(slot, 1L)
          j += 1
        }
      }
    }
    var sumCounts0 = 0L
    table.foreachOccupied { slot => sumCounts0 += table.count(slot) }
    val numS = if (combos.isEmpty) 0L else sumCounts0 / combos.length
    val tCount = msSince(t0)

    // --- peel ----------------------------------------------------------------
    t0 = System.nanoTime()
    val capacity = table.capacity
    val core = new Array[Long](math.max(1, capacity))
    java.util.Arrays.fill(core, -1L)
    // Int.MaxValue = alive; otherwise the round in which the slot was peeled
    val peeledRound = new Array[Int](math.max(1, capacity))
    java.util.Arrays.fill(peeledRound, Int.MaxValue)

    val buckets = new Bucketing(math.max(1, capacity))
    table.foreachOccupied { slot => buckets.insert(slot, table.count(slot)) }

    val agg = UpdateAggregator(cfg.aggregation, math.max(1, capacity))
    val peelable: PeelableGraph =
      if (cfg.contraction && r == 2 && s == 3) new PeelableGraph(workGraph) else null
    val peelGraph: Adjacency = if (peelable != null) peelable else workGraph

    val maxDeg = math.max(1, workGraph.maxDegree)
    val need = s - r
    val numSubsets = combos.length
    val discoveries = new LongAdder

    var finished = 0L
    var round = 0
    while (finished < numR) {
      val nb = buckets.nextBucket()
      assert(nb != null, s"bucketing exhausted with ${numR - finished} cliques unpeeled")
      val (k, ids) = nb
      round += 1
      val thisRound = round
      var i = 0
      while (i < ids.length) {
        core(ids(i)) = k
        peeledRound(ids(i)) = thisRound
        i += 1
      }
      finished += ids.length
      if (finished < numR) {
        var expected = 0L
        i = 0
        while (i < ids.length) { expected += table.count(ids(i)); i += 1 }
        agg.beginRound(expected * math.max(1, numSubsets - 1))

        Par.forBlocked(0, ids.length, grain = 4) { (blo, bhi) =>
          val vsR = new Array[Int](r)
          val iBuf = new Array[Int](maxDeg)
          val cliqueBuf = new Array[Int](s)
          val sBuf = new Array[Int](s)
          val subBuf = new Array[Int](r)
          val subsetSlots = new Array[Int](numSubsets)
          val compBufs = Array.ofDim[Int](math.max(1, need), maxDeg)
          var localDisc = 0L
          var idx = blo
          while (idx < bhi) {
            val slot = ids(idx)
            table.cliqueOf(slot, vsR)
            val iLen = Intersect.commonNeighbors(peelGraph, vsR, r, iBuf)
            System.arraycopy(vsR, 0, cliqueBuf, 0, r)
            if (iLen >= need) {
              RecListCliques.foreachCompletion(dg, iBuf, iLen, need, cliqueBuf, r, compBufs) { cl =>
                localDisc += 1
                System.arraycopy(cl, 0, sBuf, 0, s)
                Util.insertionSort(sBuf, s)
                // classify the C(s,r) subsets of this s-clique
                var abort = false
                var minA = Int.MaxValue
                var j = 0
                while (!abort && j < numSubsets) {
                  val combo = combos(j)
                  var t = 0
                  while (t < r) { subBuf(t) = sBuf(combo(t)); t += 1 }
                  val sl = table.slotOf(subBuf)
                  subsetSlots(j) = sl
                  val pr = peeledRound(sl)
                  if (pr < thisRound) abort = true // s-clique destroyed earlier
                  else if (pr == thisRound && sl < minA) minA = sl
                  j += 1
                }
                // the minimum peeled subset is the round's sole representative
                // for this s-clique (substitute for the paper's 1/a fractions)
                if (!abort && minA == slot) {
                  j = 0
                  while (j < numSubsets) {
                    val sl = subsetSlots(j)
                    if (peeledRound(sl) > thisRound) {
                      table.addCount(sl, -1L)
                      agg.offer(sl)
                    }
                    j += 1
                  }
                }
              }
            }
            idx += 1
          }
          discoveries.add(localDisc)
        }

        val updated = agg.drain()
        var u = 0
        while (u < updated.length) {
          buckets.update(updated(u), table.count(updated(u)))
          u += 1
        }

        if (peelable != null) {
          val vsPair = new Array[Int](2)
          val pairs = new Array[Int](2 * ids.length)
          i = 0
          while (i < ids.length) {
            table.cliqueOf(ids(i), vsPair)
            pairs(2 * i) = vsPair(0)
            pairs(2 * i + 1) = vsPair(1)
            i += 1
          }
          // isPeeled runs from parallel filter workers — per-call scratch only
          peelable.notePeeled(pairs, ids.length) { (a, b) =>
            val probe = if (a < b) Array(a, b) else Array(b, a)
            val sl = table.slotOf(probe)
            sl < 0 || peeledRound(sl) != Int.MaxValue
          }
        }
      }
    }
    val tPeel = msSince(t0)

    val stats = NucleusStats(
      rounds = round,
      numRCliques = numR,
      numSCliques = numS,
      updateScliqueDiscoveries = discoveries.sum(),
      contractions = if (peelable != null) peelable.contractions else 0,
      tOrientMs = tOrient,
      tListMs = tList,
      tBuildMs = tBuild,
      tCountMs = tCount,
      tPeelMs = tPeel,
      tableMemory = table.memory
    )
    new NucleusResult(r, s, table, core, oldOf, stats)
  }

  @inline private def msSince(t0: Long): Double = (System.nanoTime() - t0) / 1e6

  /** Lists all r-cliques into a flattened, lexicographically sorted array.
    * With a rank-relabeled graph the enumeration order is already sorted
    * (each block of roots emits lexicographically, blocks cover ascending
    * disjoint root ranges), so concatenation in root order suffices; without
    * relabeling each clique is id-sorted and the list is then globally
    * sorted.
    */
  private[repro] def listSortedCliques(
      dg: DirectedGraph,
      r: Int,
      sortNeeded: Boolean,
      n: Int
  ): (Array[Int], Int) = {
    val buffers = new java.util.concurrent.ConcurrentLinkedQueue[IntBuffer]()
    RecListCliques.foreachClique(dg, r) { () =>
      val buf = new IntBuffer(1024)
      buffers.add(buf)
      val tmp = new Array[Int](r)
      clique => {
        System.arraycopy(clique, 0, tmp, 0, r)
        if (sortNeeded) Util.insertionSort(tmp, r)
        var i = 0
        while (i < r) { buf += tmp(i); i += 1 }
      }
    }
    import scala.jdk.CollectionConverters._
    val nonEmpty = buffers.asScala.filter(_.size > 0).toArray
    // order blocks by their first clique's first vertex (disjoint root ranges)
    val ordered = nonEmpty.sortBy(b => b(0))
    val total = ordered.map(_.size).sum
    val flat = new Array[Int](total)
    var off = 0
    ordered.foreach { b =>
      System.arraycopy(b.unsafeArray, 0, flat, off, b.size)
      off += b.size
    }
    val num = total / math.max(1, r)
    if (!sortNeeded) return (flat, num)

    // global sort of clique records
    val enc = new CliqueEncoding(n)
    if (enc.fits(r)) {
      val keys = new Array[Long](num)
      var i = 0
      while (i < num) { keys(i) = enc.pack(flat, i * r, r); i += 1 }
      java.util.Arrays.sort(keys)
      val out = new Array[Int](total)
      i = 0
      while (i < num) { enc.unpack(keys(i), r, out, i * r); i += 1 }
      (out, num)
    } else {
      // rare fall-back for very large r: boxed sort of record views
      val recs = Array.tabulate(num) { i => java.util.Arrays.copyOfRange(flat, i * r, i * r + r) }
      java.util.Arrays.sort(recs, (a: Array[Int], b: Array[Int]) => java.util.Arrays.compare(a, b))
      val out = new Array[Int](total)
      var i = 0
      while (i < num) { System.arraycopy(recs(i), 0, out, i * r, r); i += 1 }
      (out, num)
    }
  }
}
