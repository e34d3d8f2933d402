package repro.core

import repro.SparkSpec
import repro.baselines.RefNucleus
import repro.testutil.TestGraphs

/** Config selection logic and the large-(r,s) end of the spectrum. */
class NucleusConfigSpec extends SparkSpec {

  test("optimal picks hash aggregation + contraction for (2,3) only") {
    val c23 = NucleusConfig.optimal(2, 3, 1000)
    assert(c23.aggregation === UpdateAggregator.HashTableKind)
    assert(c23.contraction)
    assert(!c23.relabel)
    val c34 = NucleusConfig.optimal(3, 4, 1000)
    assert(c34.aggregation === UpdateAggregator.ListBufferKind)
    assert(!c34.contraction)
    assert(c34.relabel)
  }

  test("optimal falls back to multi-level for large r over large n") {
    val n = 1 << 20 // 20 bits: two-level caps at r=4
    assert(NucleusConfig.optimal(4, 5, n).scheme === TwoLevelArray)
    assert(NucleusConfig.optimal(5, 6, n).scheme === MultiLevel(3))
    assert(NucleusConfig.optimal(6, 7, n).scheme === MultiLevel(4))
  }

  test("labels are distinct across the tuning grid") {
    val labels = for {
      scheme <- Seq[TableScheme](OneLevel, TwoLevelArray, MultiLevel(3))
      agg <- Seq(UpdateAggregator.SimpleArrayKind, UpdateAggregator.ListBufferKind)
      relabel <- Seq(true, false)
    } yield NucleusConfig(scheme = scheme, aggregation = agg, relabel = relabel).label
    assert(labels.distinct.size === labels.size)
  }

  test("unoptimized label mentions one-level and simple array") {
    assert(NucleusConfig.unoptimized.label.contains("1-level"))
    assert(NucleusConfig.unoptimized.label.contains("simple-array"))
  }

  for ((r, s) <- Seq((1, 4), (1, 5), (2, 6), (3, 6), (5, 6), (4, 6), (2, 7), (5, 7), (6, 7))) {
    test(s"high-s decomposition matches reference: barbells (r=$r,s=$s)") {
      val g = TestGraphs.barbells // two K6s sharing a vertex
      val ref = RefNucleus.decompose(g, r, s)
      val res = ArbNucleusDecomp.decompose(g, r, s)
      assert(res.coreMap === ref.coreMap)
      assert(res.stats.rounds === ref.rounds)
    }
  }

  for ((r, s) <- Seq((4, 7), (5, 7), (6, 7))) {
    test(s"high-s decomposition matches reference: k8 (r=$r,s=$s)") {
      val g = TestGraphs.complete(8)
      val ref = RefNucleus.decompose(g, r, s)
      val res = ArbNucleusDecomp.decompose(g, r, s)
      assert(res.coreMap === ref.coreMap)
      // K8: every r-clique is in C(8-r, s-r) s-cliques, peeled in one round
      assert(res.stats.rounds === 1)
      assert(res.maxCore === Util.choose(8 - r, s - r).toLong)
    }
  }

  test("multi-level at the maximum depth (l = r) roundtrips") {
    val g = TestGraphs.randomWithCliques(40, 0.15, Seq(7), 3)
    val ref = RefNucleus.decompose(g, 4, 5)
    val res = ArbNucleusDecomp.decompose(g, 4, 5, NucleusConfig(scheme = MultiLevel(4)))
    assert(res.coreMap === ref.coreMap)
  }
}
