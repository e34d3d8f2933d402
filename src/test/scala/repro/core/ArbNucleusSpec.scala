package repro.core

import repro.SparkSpec
import repro.baselines.RefNucleus
import repro.graph.Orientation
import repro.testutil.TestGraphs

/** ARB-NUCLEUS-DECOMP against the brute-force reference, across graphs,
  * (r,s) values, and every optimization configuration.
  */
class ArbNucleusSpec extends SparkSpec {

  private val rsValues = Seq((1, 2), (1, 3), (2, 3), (2, 4), (2, 5), (3, 4), (3, 5), (4, 5))

  // --- paper example sanity ------------------------------------------------
  test("paper Fig. 1: (3,4) core numbers are 0 / 1 / 2 as described") {
    val g = TestGraphs.paperFigure1
    val res = ArbNucleusDecomp.decompose(g, 3, 4)
    val cores = res.coreMap
    assert(cores(Seq(2, 3, 6)) === 0L) // cdg
    assert(cores(Seq(0, 1, 5)) === 1L) // abf
    assert(cores(Seq(0, 4, 5)) === 1L) // aef
    assert(cores(Seq(1, 4, 5)) === 1L) // bef
    for (t <- Seq(0, 1, 2, 3, 4).combinations(3)) assert(cores(t) === 2L, s"triangle $t")
    assert(res.stats.rounds === 3) // the paper's example peels in 3 rounds
    assert(res.stats.numRCliques === 14L)
  }

  // --- default config vs reference, all graphs × (r,s) ----------------------
  for ((name, g) <- TestGraphs.suite; (r, s) <- rsValues) {
    test(s"matches reference: $name (r=$r, s=$s)") {
      val ref = RefNucleus.decompose(g, r, s)
      val res = ArbNucleusDecomp.decompose(g, r, s)
      assert(res.stats.numRCliques === ref.numRCliques)
      assert(res.stats.numSCliques === ref.numSCliques)
      assert(res.coreMap === ref.coreMap)
      assert(res.stats.rounds === ref.rounds, "peeling-round accounting (ρ) differs")
    }
  }

  // --- every optimization configuration on fixed graphs ---------------------
  private val configGraph = TestGraphs.randomWithCliques(45, 0.12, Seq(7, 6), 17)
  private val aggs = Seq(
    UpdateAggregator.SimpleArrayKind,
    UpdateAggregator.ListBufferKind,
    UpdateAggregator.HashTableKind
  )
  private val tableConfigs: Seq[(TableScheme, Boolean, InverseMapMethod)] = Seq(
    (OneLevel, true, BinarySearch),
    (TwoLevelArray, true, StoredPointers),
    (TwoLevelArray, true, BinarySearch),
    (TwoLevelArray, false, BinarySearch),
    (MultiLevel(2), true, StoredPointers),
    (MultiLevel(3), true, StoredPointers),
    (MultiLevel(3), false, BinarySearch)
  )

  for {
    (r, s) <- Seq((2, 3), (3, 4), (4, 5))
    (scheme, contig, inv) <- tableConfigs
    if CliqueTable.feasible(scheme, r, configGraph.n)
  } {
    test(s"config sweep table: (r=$r,s=$s) ${scheme.label} contig=$contig ${inv.label}") {
      val ref = RefNucleus.decompose(configGraph, r, s)
      val cfg = NucleusConfig(scheme = scheme, contiguous = contig, inverse = inv)
      val res = ArbNucleusDecomp.decompose(configGraph, r, s, cfg)
      assert(res.coreMap === ref.coreMap)
    }
  }

  for {
    (r, s) <- Seq((2, 3), (3, 4))
    agg <- aggs
    relabel <- Seq(true, false)
  } {
    test(s"config sweep other: (r=$r,s=$s) ${agg.label} relabel=$relabel") {
      val ref = RefNucleus.decompose(configGraph, r, s)
      val cfg = NucleusConfig(aggregation = agg, relabel = relabel)
      val res = ArbNucleusDecomp.decompose(configGraph, r, s, cfg)
      assert(res.coreMap === ref.coreMap)
    }
  }

  test("graph contraction for (2,3) matches and actually contracts") {
    val g = TestGraphs.random(60, 0.3, 23)
    val ref = RefNucleus.decompose(g, 2, 3)
    val cfg = NucleusConfig(
      relabel = false,
      aggregation = UpdateAggregator.HashTableKind,
      contraction = true
    )
    val res = ArbNucleusDecomp.decompose(g, 2, 3, cfg)
    assert(res.coreMap === ref.coreMap)
    // enough peeling happens on this graph for the 2n-threshold to fire
    assert(res.stats.contractions >= 1, "expected at least one contraction")
  }

  test("degree ordering gives the same decomposition as degeneracy ordering") {
    val g = TestGraphs.random(40, 0.25, 31)
    val a = ArbNucleusDecomp.decompose(g, 2, 4, NucleusConfig(order = Orientation.Degree))
    val b = ArbNucleusDecomp.decompose(g, 2, 4, NucleusConfig(order = Orientation.Degeneracy))
    assert(a.coreMap === b.coreMap)
  }

  test("(1,2) equals classic k-core coreness (Matula–Beck)") {
    for ((name, g) <- TestGraphs.suite) {
      val (core, _) = Orientation.coreness(g)
      val res = ArbNucleusDecomp.decompose(g, 1, 2)
      val got = res.coreMap
      for (v <- 0 until g.n if got.contains(Seq(v))) {
        assert(got(Seq(v)) === core(v).toLong, s"$name vertex $v")
      }
      // every vertex with an edge appears as a 1-clique
      assert(got.size.toLong === g.n.toLong, name)
    }
  }

  test("maxCore and histogram are consistent") {
    val g = TestGraphs.paperFigure1
    val res = ArbNucleusDecomp.decompose(g, 3, 4)
    assert(res.maxCore === 2L)
    assert(res.coreHistogram === Map(0L -> 1L, 1L -> 3L, 2L -> 10L))
  }

  test("graphs with no r-cliques terminate immediately") {
    val g = TestGraphs.path(6)
    val res = ArbNucleusDecomp.decompose(g, 3, 4) // no triangles in a path
    assert(res.stats.numRCliques === 0L)
    assert(res.stats.rounds === 0)
    assert(res.coreMap.isEmpty)
  }

  test("s-cliques absent: every r-clique has core 0 in one round") {
    val g = TestGraphs.cycle(8) // edges but no triangles
    val res = ArbNucleusDecomp.decompose(g, 2, 3)
    assert(res.stats.numSCliques === 0L)
    assert(res.coreMap.values.forall(_ == 0L))
    assert(res.stats.rounds === 1)
  }

  test("unoptimized config equals optimal config") {
    val g = TestGraphs.randomWithCliques(40, 0.15, Seq(6, 5), 77)
    for ((r, s) <- Seq((2, 3), (2, 4), (3, 4))) {
      val a = ArbNucleusDecomp.decompose(g, r, s, NucleusConfig.unoptimized)
      val b = ArbNucleusDecomp.decompose(g, r, s, NucleusConfig.optimal(r, s, g.n))
      assert(a.coreMap === b.coreMap, s"(r=$r,s=$s)")
      assert(a.stats.rounds === b.stats.rounds, s"(r=$r,s=$s) rounds")
    }
  }

  test("single-thread run equals parallel run") {
    val g = TestGraphs.randomWithCliques(40, 0.15, Seq(6), 99)
    val par = ArbNucleusDecomp.decompose(g, 3, 4)
    val seq = repro.par.Par.withThreads(1) { ArbNucleusDecomp.decompose(g, 3, 4) }
    assert(par.coreMap === seq.coreMap)
    assert(par.stats.rounds === seq.stats.rounds)
  }
}
