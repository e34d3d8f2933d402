package repro.jobs

import repro.cliques.RecListCliques
import repro.graph.Orientation
import repro.harness.Harness

/** Density probe: clique counts for candidate rMAT parameters. */
object Probe2 {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try {
      for ((sc, ef) <- Seq((12, 32), (12, 64), (13, 32), (13, 64), (14, 48))) {
        val g = Harness.rmatGraph(spark, sc, ef)
        val dg = Orientation.orient(g)
        val t3 = RecListCliques.countCliques(dg, 3)
        val t4 = RecListCliques.countCliques(dg, 4)
        val t5 = RecListCliques.countCliques(dg, 5)
        println(f"PROBE2 rmat($sc,$ef): n=${g.n} m=${g.m} deg=${Orientation.degeneracy(g)} tri=$t3 c4=$t4 c5=$t5")
      }
    } finally spark.stop()
  }
}
