package repro.core

import repro.SparkSpec
import scala.util.Random

/** The Julienne-style bucketing structure against a naive simulation. */
class BucketingSpec extends SparkSpec {

  test("extracts buckets in nondecreasing order, all ids exactly once") {
    val b = new Bucketing(100)
    val rnd = new Random(1)
    val init = Array.tabulate(100)(_ => rnd.nextInt(50).toLong)
    for (i <- 0 until 100) b.insert(i, init(i))
    var last = -1L
    val seen = scala.collection.mutable.Set[Int]()
    var nb = b.nextBucket()
    while (nb != null) {
      val (v, ids) = nb
      assert(v >= last)
      last = v
      ids.foreach { id => assert(seen.add(id), s"id $id extracted twice") }
      ids.foreach(id => assert(init(id) === v))
      nb = b.nextBucket()
    }
    assert(seen.size === 100)
  }

  test("updates move ids to lower buckets; clamped at the frontier") {
    val b = new Bucketing(10)
    for (i <- 0 until 10) b.insert(i, 5L)
    // extract nothing yet; update id 0 down to 2
    b.update(0, 2L)
    val (v1, ids1) = b.nextBucket()
    assert(v1 === 2L)
    assert(ids1.toSeq === Seq(0))
    // now frontier is 2: an update to 0 clamps to 2
    b.update(1, 0L)
    val (v2, ids2) = b.nextBucket()
    assert(v2 === 2L)
    assert(ids2.toSeq === Seq(1))
    val (v3, ids3) = b.nextBucket()
    assert(v3 === 5L)
    assert(ids3.sorted.toSeq === (2 until 10).toSeq)
  }

  test("updates on peeled ids are ignored") {
    val b = new Bucketing(3)
    b.insert(0, 1L); b.insert(1, 2L); b.insert(2, 3L)
    val (_, ids) = b.nextBucket()
    assert(ids.toSeq === Seq(0))
    b.update(0, 0L) // peeled; no effect
    val (v, ids2) = b.nextBucket()
    assert(v === 2L && ids2.toSeq === Seq(1))
  }

  test("skips large empty ranges via overflow rematerialization") {
    val b = new Bucketing(4, window = 8)
    b.insert(0, 0L)
    b.insert(1, 1000000L)
    b.insert(2, 1000000L)
    b.insert(3, 2000000L)
    assert(b.nextBucket()._1 === 0L)
    val (v, ids) = b.nextBucket()
    assert(v === 1000000L)
    assert(ids.sorted.toSeq === Seq(1, 2))
    assert(b.nextBucket()._1 === 2000000L)
    assert(b.nextBucket() === null)
  }

  test("repeated updates settle at the lowest value") {
    val b = new Bucketing(2, window = 4)
    b.insert(0, 100L)
    b.insert(1, 0L)
    b.update(0, 50L)
    b.update(0, 20L)
    b.update(0, 20L) // no-op duplicate
    assert(b.nextBucket()._1 === 0L)
    val (v, ids) = b.nextBucket()
    assert(v === 20L && ids.toSeq === Seq(0))
  }

  test("randomized peel simulation matches a naive priority structure") {
    val rnd = new Random(7)
    val n = 200
    val b = new Bucketing(n, window = 16)
    val value = Array.tabulate(n)(_ => rnd.nextInt(40).toLong)
    for (i <- 0 until n) b.insert(i, value(i))
    val alive = Array.fill(n)(true)
    var frontier = 0L
    var extracted = 0
    while (extracted < n) {
      val clamped = (0 until n).filter(alive).map(i => math.max(value(i), frontier))
      val expectMin = clamped.min
      val (v, ids) = b.nextBucket()
      assert(v === expectMin)
      frontier = v
      val expectedIds = (0 until n).filter(i => alive(i) && math.max(value(i), frontier) == v)
      assert(ids.sorted.toSeq === expectedIds)
      ids.foreach(i => alive(i) = false)
      extracted += ids.length
      // random decrements of some survivors
      for (i <- 0 until n if alive(i) && rnd.nextBoolean()) {
        value(i) = math.max(frontier, value(i) - rnd.nextInt(3))
        b.update(i, value(i))
      }
    }
    assert(b.nextBucket() === null)
  }
}
