package repro.core

import org.scalacheck.Gen
import repro.SparkSpec
import repro.baselines.RefNucleus
import repro.testutil.{Check, TestGraphs}

/** Randomized cross-checks: ARB-NUCLEUS-DECOMP under a random configuration
  * must match the brute-force reference on random graphs and (r,s).
  */
class NucleusPropertySpec extends SparkSpec {

  private val graphGen = for {
    n <- Gen.choose(6, 32)
    p <- Gen.choose(10, 45).map(_ / 100.0)
    seed <- Gen.choose(0L, 100000L)
  } yield (n, p, seed)

  private val rsGen = for {
    r <- Gen.choose(1, 4)
    s <- Gen.choose(r + 1, 5)
  } yield (r, s)

  private val configGen = for {
    schemeIx <- Gen.choose(0, 3)
    contig <- Gen.oneOf(true, false)
    inv <- Gen.oneOf[InverseMapMethod](BinarySearch, StoredPointers)
    relabel <- Gen.oneOf(true, false)
    agg <- Gen.oneOf(
      UpdateAggregator.SimpleArrayKind,
      UpdateAggregator.ListBufferKind,
      UpdateAggregator.HashTableKind
    )
    contraction <- Gen.oneOf(true, false)
  } yield (schemeIx, contig, inv, relabel, agg, contraction)

  private def mkScheme(ix: Int, r: Int): TableScheme = ix match {
    case 0          => OneLevel
    case 1          => TwoLevelArray
    case 2 if r >= 2 => MultiLevel(2)
    case 3 if r >= 3 => MultiLevel(3)
    case _          => TwoLevelArray
  }

  test("random graphs × random (r,s) × random config match the reference") {
    val gen = for {
      g <- graphGen
      rs <- rsGen
      cfg <- configGen
    } yield (g, rs, cfg)
    Check.forAll(gen, trials = 80) {
      case ((n, p, seed), (r, s), (schemeIx, contig0, inv0, relabel, agg, contraction)) =>
        val g = TestGraphs.random(n, p, seed)
        val scheme = mkScheme(schemeIx, r)
        // normalize illegal combos the way callers must
        val contig = if (inv0 == StoredPointers) true else contig0
        val cfg = NucleusConfig(
          scheme = scheme,
          contiguous = contig,
          inverse = inv0,
          relabel = relabel,
          aggregation = agg,
          contraction = contraction
        )
        if (CliqueTable.feasible(scheme, r, g.n)) {
          val ref = RefNucleus.decompose(g, r, s)
          val res = ArbNucleusDecomp.decompose(g, r, s, cfg)
          assert(res.coreMap === ref.coreMap, s"n=$n p=$p seed=$seed (r=$r,s=$s) ${cfg.label}")
          assert(res.stats.rounds === ref.rounds)
          assert(res.stats.numSCliques === ref.numSCliques)
        }
    }
  }

  test("rounds never exceed the number of r-cliques") {
    Check.forAll(graphGen, trials = 30) { case (n, p, seed) =>
      val g = TestGraphs.random(n, p, seed)
      val res = ArbNucleusDecomp.decompose(g, 2, 3)
      assert(res.stats.rounds.toLong <= math.max(1L, res.stats.numRCliques))
    }
  }

  test("core numbers never exceed initial s-clique counts") {
    Check.forAll(graphGen, trials = 30) { case (n, p, seed) =>
      val g = TestGraphs.random(n, p, seed)
      val res = ArbNucleusDecomp.decompose(g, 2, 4)
      val table = res.table
      // re-derive initial counts with the reference
      val ref = RefNucleus.decompose(g, 2, 4)
      val _ = table
      res.coreMap.foreach { case (c, core) =>
        assert(core <= ref.numSCliques, s"clique $c")
      }
    }
  }
}
