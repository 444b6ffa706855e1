package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Tables

/** spark-submit entrypoints, one per reproduced table (DESIGN.md §4).
  *
  * Example:
  *   spark-submit --class repro.jobs.T1ThroughputVsLatency target/scala-2.13/repro_2.13-*.jar
  */
object T1ThroughputVsLatency {
  def main(args: Array[String]): Unit = { Tables.t1(); () }
}

object T2LatencyScaleOut {
  def main(args: Array[String]): Unit = { Tables.t2(); () }
}

object T3LatencyDistribution {
  def main(args: Array[String]): Unit = { Tables.t3(); () }
}

object T4ThroughputScaleOut {
  def main(args: Array[String]): Unit = { Tables.t4(); () }
}

object T5WindowJoinLatency {
  def main(args: Array[String]): Unit = { Tables.t5(); () }
}

object T6FaultTolerance {
  def main(args: Array[String]): Unit = { Tables.t6(); () }
}

object T7MultiTenancy {
  def main(args: Array[String]): Unit = { Tables.t7(); () }
}

object T8BaselineComparison {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("t8-baseline")
      .config("spark.sql.shuffle.partitions", "8")
      .getOrCreate()
    try { Tables.t8(spark); () }
    finally spark.stop()
  }
}

/** Runs every table in sequence — the full evaluation. */
object AllTables {
  def main(args: Array[String]): Unit = {
    Tables.t1(); Tables.t2(); Tables.t3(); Tables.t4(); Tables.t5(); Tables.t6(); Tables.t7()
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("t8-baseline")
      .getOrCreate()
    try { Tables.t8(spark); () }
    finally spark.stop()
  }
}
