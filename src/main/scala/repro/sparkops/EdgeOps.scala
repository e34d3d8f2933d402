package repro.sparkops

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.CSRGraph

/** DataFrame-side edge-list preparation: the outer orchestration layer that
  * feeds the shared-memory nucleus decomposition core (DESIGN.md
  * "Reproduction strategy").
  */
object EdgeOps {

  /** Canonicalizes an edge DataFrame (columns src, dst): drops self loops,
    * orients each undirected edge as (u < v), and deduplicates.
    */
  def canonicalize(edges: DataFrame): DataFrame =
    edges
      .select(
        least(col("src"), col("dst")).cast("long").as("src"),
        greatest(col("src"), col("dst")).cast("long").as("dst")
      )
      .where(col("src") =!= col("dst"))
      .distinct()

  /** Per-vertex degrees of a canonical edge list (columns v, degree). */
  def degrees(canonical: DataFrame): DataFrame =
    canonical
      .select(col("src").as("v"))
      .unionByName(canonical.select(col("dst").as("v")))
      .groupBy("v")
      .agg(count(lit(1)).as("degree"))

  /** Summary used by the Fig. 7 table: n (max id + 1) and m. */
  def sizeStats(canonical: DataFrame): (Long, Long) = {
    val row = canonical
      .agg(
        greatest(max(col("src")), max(col("dst"))).as("maxid"),
        count(lit(1)).as("m")
      )
      .collect()(0)
    if (row.isNullAt(0)) (0L, 0L) else (row.getLong(0) + 1, row.getLong(1))
  }

  /** Collects a canonical edge list into an in-memory CSR graph for the
    * shared-memory core. Vertex ids must fit in Int.
    */
  def toCSR(canonical: DataFrame): CSRGraph = {
    val rows = canonical.select(col("src"), col("dst")).collect()
    val edges = new Array[(Int, Int)](rows.length)
    var i = 0
    var maxId = -1
    while (i < rows.length) {
      val u = rows(i).getLong(0)
      val v = rows(i).getLong(1)
      require(u <= Int.MaxValue && v <= Int.MaxValue, "vertex id exceeds Int range")
      edges(i) = (u.toInt, v.toInt)
      if (v.toInt > maxId) maxId = v.toInt
      if (u.toInt > maxId) maxId = u.toInt
      i += 1
    }
    CSRGraph.fromEdges(edges, maxId + 1)
  }

  /** One-call pipeline: generate/ingest → canonicalize → CSR. */
  def csrOf(spark: SparkSession, rawEdges: DataFrame): CSRGraph = {
    val _ = spark
    toCSR(canonicalize(rawEdges))
  }
}
