package repro.cliques

import org.scalacheck.Gen
import repro.SparkSpec
import repro.testutil.Check

class CliqueEncodingSpec extends SparkSpec {

  test("bits grow with n; arity shrinks") {
    assert(new CliqueEncoding(2).bits === 1)
    assert(new CliqueEncoding(1 << 10).bits === 10)
    assert(new CliqueEncoding((1 << 10) + 1).bits === 11)
    assert(new CliqueEncoding(1 << 20).maxArity === 3)
    assert(new CliqueEncoding(1 << 15).maxArity === 4)
  }

  test("pack/unpack roundtrip (property)") {
    val gen = for {
      bitsN <- Gen.choose(4, 20)
      n = 1 << bitsN
      enc = new CliqueEncoding(n)
      len <- Gen.choose(1, enc.maxArity)
      vs <- Gen.listOfN(len, Gen.choose(0, n - 1))
    } yield (n, vs.sorted)
    Check.forAll(gen) { case (n, vs) =>
      val enc = new CliqueEncoding(n)
      val arr = vs.toArray
      val key = enc.pack(arr, 0, arr.length)
      assert(key >= 0, "keys must leave the top bits clear")
      assert((key & CliqueEncoding.EmptyBit) === 0L)
      val out = new Array[Int](arr.length)
      enc.unpack(key, arr.length, out, 0)
      assert(out.toSeq === vs)
    }
  }

  test("packed order is lexicographic for equal-length tuples") {
    val enc = new CliqueEncoding(1 << 10)
    val a = enc.pack(Array(1, 2, 3), 0, 3)
    val b = enc.pack(Array(1, 2, 4), 0, 3)
    val c = enc.pack(Array(2, 0, 0), 0, 3)
    assert(a < b && b < c)
  }

  test("pack with offset reads the right window") {
    val enc = new CliqueEncoding(256)
    val arr = Array(9, 9, 5, 6, 7, 9)
    val key = enc.pack(arr, 2, 3)
    val out = new Array[Int](3)
    enc.unpack(key, 3, out, 0)
    assert(out.toSeq === Seq(5, 6, 7))
  }

  test("hash spreads consecutive keys") {
    val hashes = (0L until 1000L).map(CliqueEncoding.hash).toSet
    assert(hashes.size === 1000)
  }

  test("fits rejects arities beyond 62 bits") {
    val enc = new CliqueEncoding(1 << 20)
    assert(enc.fits(3))
    assert(!enc.fits(4))
  }
}
