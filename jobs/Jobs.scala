package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{Harness, Tables}

/** spark-submit entrypoints, one per evaluation table:
  *
  *   spark-submit --class repro.jobs.Table1Rho target/scala-2.13/repro_2.13-*.jar
  *
  * Each writes its markdown table under bench_results/ and prints it.
  */
object JobSession {
  def local(): SparkSession = {
    val s = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("nucleus-repro")
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

object Table1Rho {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table1Rho(spark, Harness.snapNames, maxS = 7)
    finally spark.stop()
  }
}

object Table2TOpts {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table2TOpts(spark, Harness.snapNames, Seq((2, 3), (2, 4), (3, 4), (4, 5)))
    finally spark.stop()
  }
}

object Table3Space {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table3Space(spark, Harness.snapNames, Seq((2, 3), (2, 4), (3, 4), (4, 5)))
    finally spark.stop()
  }
}

object Table4OtherOpts {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table4OtherOpts(spark, Harness.snapNames, Seq((2, 3), (2, 4), (3, 4)))
    finally spark.stop()
  }
}

object Table5Baselines {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table5Baselines(spark, Harness.snapNames)
    finally spark.stop()
  }
}

object Table6AllRS {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table6AllRS(spark, Harness.snapNames, maxS = 7)
    finally spark.stop()
  }
}

object Table7Scaling {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table7Scaling(spark, Seq("dblp-lite", "skitter-lite", "livejournal-lite"))
    finally spark.stop()
  }
}

object Table8Rmat {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try Tables.table8Rmat(spark)
    finally spark.stop()
  }
}

/** Runs every table in sequence (the full evaluation). */
object RunAll {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local()
    try {
      Tables.table1Rho(spark, Harness.snapNames, maxS = 7)
      Tables.table2TOpts(spark, Harness.snapNames, Seq((2, 3), (2, 4), (3, 4), (4, 5)))
      Tables.table3Space(spark, Harness.snapNames, Seq((2, 3), (2, 4), (3, 4), (4, 5)))
      Tables.table4OtherOpts(spark, Harness.snapNames, Seq((2, 3), (2, 4), (3, 4)))
      Tables.table5Baselines(spark, Harness.snapNames)
      Tables.table6AllRS(spark, Harness.snapNames, maxS = 7)
      Tables.table7Scaling(spark, Seq("dblp-lite", "skitter-lite", "livejournal-lite"))
      Tables.table8Rmat(spark)
    } finally spark.stop()
  }
}
