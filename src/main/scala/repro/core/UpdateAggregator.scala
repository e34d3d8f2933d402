package repro.core

import java.util.concurrent.atomic.{AtomicInteger, AtomicIntegerArray, AtomicLong}

/** Collects U — the set of r-clique slots whose s-clique count changed in
  * the current peeling round (paper §5.5). Implementations differ in how
  * they trade contention against clearing cost; all must dedupe so each
  * slot is reported once per round.
  *
  * `offer(slot)` is called from UPDATE worker threads (possibly many times
  * per slot); `drain()` returns the distinct slots and prepares the
  * structure for the next round.
  */
sealed trait UpdateAggregator {
  /** Starts a round. `expectedUpdates` is an upper bound on the number of
    * *distinct* slots that will be offered this round (the caller derives it
    * from the peeled cliques' s-clique counts); only the hash-table option
    * uses it, to size its per-round table.
    */
  def beginRound(expectedUpdates: Long): Unit
  def offer(slot: Int): Unit
  def drain(): Array[Int]
  def label: String
}

object UpdateAggregator {
  sealed trait Kind { def label: String }
  case object SimpleArrayKind extends Kind { val label = "simple-array" }
  case object ListBufferKind extends Kind { val label = "list-buffer" }
  case object HashTableKind extends Kind { val label = "hash-table" }

  def apply(kind: Kind, capacity: Int): UpdateAggregator = kind match {
    case SimpleArrayKind => new SimpleArrayAggregator(capacity)
    case ListBufferKind  => new ListBufferAggregator(capacity)
    case HashTableKind   => new HashTableAggregator(capacity)
  }
}

/** Round-stamped dedup shared by the array/list-buffer options: a CAS on the
  * per-slot round stamp decides which thread is "first to modify" the slot
  * this round (the paper uses the same first-modification test).
  */
private[core] final class RoundStamp(capacity: Int) {
  private val stamp = new AtomicIntegerArray(capacity)
  private var round = 0
  def nextRound(): Unit = round += 1
  /** True iff the caller is the first to claim `slot` this round. */
  def claim(slot: Int): Boolean = {
    val cur = stamp.get(slot)
    cur != round && stamp.compareAndSet(slot, cur, round)
  }
}

/** §5.5 "Simple Array": one shared array plus a single fetch-and-add slot
  * counter — maximal contention on the counter, but U is compact and needs
  * no clearing.
  */
final class SimpleArrayAggregator(capacity: Int) extends UpdateAggregator {
  private val stamps = new RoundStamp(capacity)
  private val u = new Array[Int](math.max(1, capacity))
  private val next = new AtomicInteger(0)

  def label = "simple-array"

  def beginRound(expectedUpdates: Long): Unit = {
    stamps.nextRound()
    next.set(0)
  }

  def offer(slot: Int): Unit =
    if (stamps.claim(slot)) u(next.getAndIncrement()) = slot

  def drain(): Array[Int] = java.util.Arrays.copyOf(u, next.get())
}

/** §5.5 "List Buffer": each thread reserves fixed-size blocks of the shared
  * array with one fetch-and-add per block, then fills its block privately —
  * contention drops by the buffer size. Unused tail slots are filtered out
  * (and reset) at drain time, touching only the allocated region.
  */
final class ListBufferAggregator(capacity: Int, blockSize: Int = 512) extends UpdateAggregator {
  private val stamps = new RoundStamp(capacity)
  // worst case: every slot updated once, each thread wasting < blockSize
  private val u = new Array[Int](math.max(1, capacity + 256 * blockSize))
  java.util.Arrays.fill(u, -1)
  private val nextBlock = new AtomicInteger(0)
  private val epoch = new AtomicInteger(0)

  private final class ThreadState { var pos = 0; var end = 0; var seenEpoch = -1 }
  private val local = ThreadLocal.withInitial[ThreadState](() => new ThreadState)

  def label = "list-buffer"

  def beginRound(expectedUpdates: Long): Unit = {
    stamps.nextRound()
    nextBlock.set(0)
    epoch.incrementAndGet()
  }

  def offer(slot: Int): Unit = {
    if (!stamps.claim(slot)) return
    val st = local.get()
    val e = epoch.get()
    if (st.seenEpoch != e) { st.seenEpoch = e; st.pos = 0; st.end = 0 }
    if (st.pos == st.end) {
      st.pos = nextBlock.getAndAdd(blockSize)
      st.end = st.pos + blockSize
    }
    u(st.pos) = slot
    st.pos += 1
  }

  def drain(): Array[Int] = {
    val hi = math.min(u.length, nextBlock.get())
    val out = new IntBuffer(math.max(16, hi / 2))
    var i = 0
    while (i < hi) {
      val v = u(i)
      if (v >= 0) { out += v; u(i) = -1 }
      i += 1
    }
    out.toArray
  }
}

/** §5.5 "Hash Table": a parallel open-addressing set whose probe region is
  * sized per round from the peeled cliques' counts — insertion itself
  * dedupes (no shared slot counter to contend on). The paper's version
  * reserves less space in small rounds so there is less to clear; we get
  * the same effect with zero clearing: one preallocated array of
  * round-stamped entries ((round << 32) | slot), where a cell not stamped
  * with the current round is empty by definition. `expectedUpdates` is a
  * true upper bound on distinct offers, so the chosen probe region can
  * never overflow.
  */
final class HashTableAggregator(capacity: Int) extends UpdateAggregator {
  require(capacity <= (1 << 29), s"aggregator capacity too large: $capacity")
  private val maxCap = Util.nextPow2(math.max(64, 2 * capacity))
  private val table = new java.util.concurrent.atomic.AtomicLongArray(maxCap)
  private var mask = 63
  private var round = 0L
  private val inserted = new AtomicLong(0)

  def label = "hash-table"

  def beginRound(expectedUpdates: Long): Unit = {
    round += 1
    val bound = math.min(expectedUpdates, capacity.toLong)
    val want = Util.nextPow2(math.max(64L, bound * 2L).min(maxCap.toLong).toInt)
    mask = want - 1
    inserted.set(0)
  }

  def offer(slot: Int): Unit = {
    val m = mask
    val tag = (round << 32) | slot.toLong
    var i = (repro.cliques.CliqueEncoding.hash(slot.toLong) & m).toInt
    while (true) {
      val cur = table.get(i)
      if (cur == tag) return
      if ((cur >>> 32) != round) {
        // stale entry from an earlier round == empty cell
        if (table.compareAndSet(i, cur, tag)) { inserted.incrementAndGet(); return }
        // CAS lost: re-read the same cell (it may now hold `tag`)
      } else i = (i + 1) & m
    }
  }

  def drain(): Array[Int] = {
    val out = new IntBuffer(math.max(16, inserted.get().toInt))
    var i = 0
    while (i <= mask) {
      val v = table.get(i)
      if ((v >>> 32) == round) out += (v & 0xFFFFFFFFL).toInt
      i += 1
    }
    out.toArray
  }
}
