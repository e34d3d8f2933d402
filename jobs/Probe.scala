package repro.jobs

import repro.core.ArbNucleusDecomp
import repro.harness.Harness

/** Quick sizing probe: prints per-(r,s) decomposition times for the named
  * substitute graphs (used to budget the bench suites).
  */
object Probe {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    val names = if (args.nonEmpty) args.toSeq else Seq("skitter-lite", "livejournal-lite", "orkut-lite")
    try {
      for (name <- names) {
        val g = Harness.graph(spark, name)
        for ((r, s) <- Seq((2, 3), (3, 4), (4, 5))) {
          val (res, ms) = Harness.timeMs(2)(ArbNucleusDecomp.decompose(g, r, s))
          println(f"PROBE $name n=${g.n} m=${g.m} ($r,$s): $ms%.1f ms rounds=${res.stats.rounds} numR=${res.stats.numRCliques} numS=${res.stats.numSCliques}")
        }
      }
    } finally spark.stop()
  }
}
