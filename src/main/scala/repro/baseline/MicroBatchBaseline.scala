package repro.baseline

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.functions._
import org.apache.spark.sql.streaming.Trigger
import repro.core.WindowDef
import repro.harness.{LatencyHistogram, LatencyStats}

/** The comparison system of the reproduction: the same windowed-count
  * workload on Spark Structured Streaming's micro-batch engine.
  *
  * The paper's motivation (§1, citing [18]) is that micro-batch engines
  * cannot hold tail latency at the tens-of-milliseconds level Jet targets —
  * each result waits for batch formation, trigger scheduling and watermark
  * advancement. This runner measures exactly the same latency the Jet
  * harness measures: a window result is due at its window-end's wall-clock
  * deadline; latency is how far past the deadline `foreachBatch` observed
  * it.
  */
object MicroBatchBaseline {

  /** Run a sliding-window count over a rate-controlled synthetic bid stream
    * on the micro-batch engine and return the latency distribution.
    */
  def runWindowedCount(
      spark: SparkSession,
      ratePerSec: Double,
      durationSec: Double,
      warmupSec: Double,
      wd: WindowDef,
      numKeys: Int,
      triggerMs: Long = 100
  ): LatencyStats = {
    val s = spark
    import s.implicits._

    // Keep the stateful shuffle narrow — this is a single-box run and each
    // extra state-store partition costs per-batch overhead.
    val prevShuffle = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")

    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val input = MemoryStream[(Long, Long)] // (auction, eventTsMs)

    val hist        = new LatencyHistogram()
    val t0          = 0L
    val startNanos  = System.nanoTime()
    val warmupEndTs = t0 + (warmupSec * 1000).toLong
    def dueNanos(tsMs: Long): Long = startNanos + (tsMs - t0) * 1000000L

    val agg = input
      .toDF()
      .toDF("auction", "tsMs")
      .withColumn("eventTime", timestamp_millis(col("tsMs")))
      .withWatermark("eventTime", "0 milliseconds")
      .groupBy(
        window(col("eventTime"), s"${wd.sizeMs} milliseconds", s"${wd.slideMs} milliseconds"),
        col("auction")
      )
      .count()

    val query = agg.writeStream
      .outputMode("append")
      .trigger(Trigger.ProcessingTime(triggerMs))
      .foreachBatch { (batch: org.apache.spark.sql.DataFrame, _: Long) =>
        val now  = System.nanoTime()
        val ends = batch.select(unix_millis(col("window.end"))).collect()
        ends.foreach { r =>
          val endMs = r.getLong(0)
          if (endMs >= warmupEndTs) hist.record(now - dueNanos(endMs))
        }
      }
      .start()

    // Feed events on schedule. Chunks flush at ~50 ms granularity: every
    // addData call creates a MemoryStream block (= one scan task per
    // micro-batch), so tiny chunks would bloat every batch's scan stage.
    val totalEvents = (ratePerSec * (durationSec + warmupSec)).toLong
    var seq         = 0L
    val rnd         = new scala.util.Random(7)
    val minChunk    = math.max(1L, (ratePerSec * 0.05).toLong)
    while (seq < totalEvents) {
      val allowed = math.min(totalEvents, ((System.nanoTime() - startNanos) * ratePerSec / 1e9).toLong)
      if (allowed - seq >= minChunk || allowed >= totalEvents) {
        val n     = allowed - seq
        val chunk = (seq until seq + n).map { i =>
          (rnd.nextInt(numKeys).toLong, t0 + (i * 1000.0 / ratePerSec).toLong)
        }
        if (chunk.nonEmpty) input.addData(chunk)
        seq += n
      } else Thread.sleep(5)
    }
    // Push the watermark past every open window, then drain.
    input.addData(Seq((0L, t0 + ((durationSec + warmupSec) * 1000).toLong + 2 * wd.sizeMs)))
    query.processAllAvailable()
    query.stop()
    spark.conf.set("spark.sql.shuffle.partitions", prevShuffle)
    LatencyStats.from(hist)
  }
}
