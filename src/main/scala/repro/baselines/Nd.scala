package repro.baselines

import repro.graph.CSRGraph

/** Result of a baseline nucleus decomposition run. `core(id)` indexes the
  * run's [[CliqueIndex]]; `rounds` counts sequential peel steps and
  * `discoveries` counts s-clique enumerations — the two work metrics the
  * paper uses to explain ARB-NUCLEUS-DECOMP's speedups over these codes.
  */
final case class BaselineResult(
    index: CliqueIndex,
    core: Array[Long],
    rounds: Long,
    discoveries: Long,
    millis: Double
) {
  def coreMap: Map[Seq[Int], Long] = {
    val out = Map.newBuilder[Seq[Int], Long]
    val buf = new Array[Int](index.r)
    var id = 0
    while (id < index.num) {
      index.vertsOf(id, buf)
      out += buf.toSeq -> core(id)
      id += 1
    }
    out.result()
  }
  def maxCore: Long = if (core.isEmpty) -1L else core.max
}

/** ND — Sariyüce et al.'s serial global peeling [57]: repeatedly remove the
  * single r-clique with the minimum current s-clique count, assign it the
  * running maximum as its core number, and decrement the counts of
  * surviving r-cliques sharing still-live s-cliques with it. One peel per
  * step, so `rounds == num r-cliques` — the paper measures PND/ND at
  * 5608–84170× the rounds of ARB-NUCLEUS-DECOMP.
  */
object Nd {

  def run(g: CSRGraph, r: Int, s: Int): BaselineResult = run(g, r, s, parallelUpdates = false)

  /** `parallelUpdates = true` gives PND's behaviour: the count decrements of
    * a peel step are applied as one batch, but peels themselves remain
    * sequential (PND does not parallelize within the peeling process, which
    * is the source of its 5608–84170× round blow-up vs ARB).
    */
  private[baselines] def run(g: CSRGraph, r: Int, s: Int, parallelUpdates: Boolean): BaselineResult = {
    val t0 = System.nanoTime()
    val idx = new CliqueIndex(g, r)
    val (counts0, _) = idx.countScliques(s)
    val num = idx.num
    val counts = counts0.clone()
    val core = new Array[Long](num)
    val peeled = new Array[Boolean](num)
    val scratch = idx.newScratch(s)

    // lazy-deletion binary heap of (count, id) packed into a Long
    val heap = new java.util.PriorityQueue[java.lang.Long](math.max(1, num))
    var id = 0
    while (id < num) { heap.add((counts(id).toLong << 32) | id.toLong); id += 1 }

    var kCur = 0L
    var rounds = 0L
    var discoveries = 0L
    val pendingDecrements = new repro.core.IntBuffer()

    while (!heap.isEmpty) {
      val top = heap.poll().longValue()
      val cid = (top & 0xFFFFFFFFL).toInt
      val ccount = top >>> 32
      if (!peeled(cid) && ccount == counts(cid).toLong) {
        rounds += 1
        kCur = math.max(kCur, ccount)
        core(cid) = kCur
        peeled(cid) = true
        pendingDecrements.clear()
        discoveries += idx.foreachIncidentSclique(cid, s, scratch) { subsetIds =>
          var dead = false
          var j = 0
          while (!dead && j < subsetIds.length) {
            if (subsetIds(j) != cid && peeled(subsetIds(j))) dead = true
            j += 1
          }
          if (!dead) {
            j = 0
            while (j < subsetIds.length) {
              if (subsetIds(j) != cid) pendingDecrements += subsetIds(j)
              j += 1
            }
          }
        }
        if (parallelUpdates && pendingDecrements.size > 1024) {
          // PND batches a peel's decrements (sort + run-length grouping of
          // repeated ids); the binary heap forces reinsertion to stay
          // sequential, which is precisely the intra-bucket serialization
          // the paper criticizes PND for.
          val arr = pendingDecrements.toArray
          java.util.Arrays.sort(arr)
          var i = 0
          while (i < arr.length) {
            var j = i
            while (j < arr.length && arr(j) == arr(i)) j += 1
            counts(arr(i)) -= (j - i)
            heap.add((counts(arr(i)).toLong << 32) | arr(i).toLong)
            i = j
          }
        } else {
          var i = 0
          while (i < pendingDecrements.size) {
            val t = pendingDecrements(i)
            counts(t) -= 1
            heap.add((counts(t).toLong << 32) | t.toLong)
            i += 1
          }
        }
      }
    }
    BaselineResult(idx, core, rounds, discoveries, (System.nanoTime() - t0) / 1e6)
  }
}

/** PND — Sariyüce et al.'s parallel global algorithm [56]. It peels
  * r-cliques with equal counts sequentially (to avoid the synchronization
  * the paper's update-aggregation optimization addresses), parallelizing
  * only the count updates, so its round count equals ND's.
  */
object Pnd {
  def run(g: CSRGraph, r: Int, s: Int): BaselineResult = Nd.run(g, r, s, parallelUpdates = true)
}
