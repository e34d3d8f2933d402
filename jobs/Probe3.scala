package repro.jobs

import repro.core._
import repro.harness.Harness

/** Aggregation-option stability probe: interleaved repeated measurements. */
object Probe3 {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try {
      val g = Harness.graph(spark, "orkut-lite")
      val base = NucleusConfig(relabel = false, aggregation = UpdateAggregator.SimpleArrayKind)
      val opts = Seq(
        "simple" -> base,
        "listbuf" -> base.copy(aggregation = UpdateAggregator.ListBufferKind),
        "hash" -> base.copy(aggregation = UpdateAggregator.HashTableKind),
        "contract" -> base.copy(contraction = true)
      )
      // warm up all paths
      opts.foreach { case (_, c) => ArbNucleusDecomp.decompose(g, 2, 3, c) }
      for (trial <- 1 to 3; (name, c) <- opts) {
        val (_, ms) = Harness.timeMs(1)(ArbNucleusDecomp.decompose(g, 2, 3, c))
        println(f"PROBE3 trial=$trial $name%-9s ${ms}%.0f ms")
      }
    } finally spark.stop()
  }
}
