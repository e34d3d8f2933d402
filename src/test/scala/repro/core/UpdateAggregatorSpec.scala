package repro.core

import repro.SparkSpec
import repro.par.Par

/** The three §5.5 update-aggregation options: per-round dedup, parallel
  * offers, reuse across rounds.
  */
class UpdateAggregatorSpec extends SparkSpec {

  private def kinds = Seq(
    UpdateAggregator.SimpleArrayKind,
    UpdateAggregator.ListBufferKind,
    UpdateAggregator.HashTableKind
  )

  for (kind <- kinds) {
    test(s"${kind.label}: dedupes within a round") {
      val agg = UpdateAggregator(kind, 1000)
      agg.beginRound(1000)
      agg.offer(5); agg.offer(5); agg.offer(7); agg.offer(5)
      assert(agg.drain().sorted.toSeq === Seq(5, 7))
    }

    test(s"${kind.label}: parallel offers collect each slot once") {
      val agg = UpdateAggregator(kind, 10000)
      agg.beginRound(10000)
      Par.forRange(0, 100000)(i => agg.offer(i % 1000))
      val got = agg.drain()
      assert(got.length === 1000)
      assert(got.sorted.toSeq === (0 until 1000).toSeq)
    }

    test(s"${kind.label}: rounds are independent") {
      val agg = UpdateAggregator(kind, 100)
      agg.beginRound(100)
      agg.offer(1); agg.offer(2)
      assert(agg.drain().sorted.toSeq === Seq(1, 2))
      agg.beginRound(100)
      agg.offer(2); agg.offer(3)
      assert(agg.drain().sorted.toSeq === Seq(2, 3))
      agg.beginRound(100)
      assert(agg.drain().isEmpty)
    }

    test(s"${kind.label}: many small rounds reuse storage") {
      val agg = UpdateAggregator(kind, 5000)
      for (round <- 0 until 50) {
        agg.beginRound(16)
        Par.forRange(0, 64)(i => agg.offer((round * 64 + i) % 5000))
        val got = agg.drain()
        assert(got.length === 64)
        assert(got.toSet.size === 64)
      }
    }
  }

  test("hash-table: expectedUpdates bound is honored without overflow") {
    val agg = UpdateAggregator(UpdateAggregator.HashTableKind, 1 << 20)
    agg.beginRound(10) // small estimate, but offers stay within it
    Par.forRange(0, 100)(i => agg.offer(i % 10))
    assert(agg.drain().length === 10)
  }

  test("list-buffer: more threads than blocks still collects all") {
    val agg = UpdateAggregator(UpdateAggregator.ListBufferKind, 50000)
    agg.beginRound(50000)
    Par.forRange(0, 50000)(i => agg.offer(i))
    assert(agg.drain().length === 50000)
  }
}
