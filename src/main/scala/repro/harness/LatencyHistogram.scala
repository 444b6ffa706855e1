package repro.harness

import java.util.concurrent.atomic.AtomicLongArray

/** Thread-safe fixed-bucket latency recorder (an HdrHistogram-lite).
  *
  * Latencies are recorded in nanoseconds into linear buckets of
  * `bucketMicros`; percentiles up to p99.99 are read by scanning the
  * cumulative counts — the paper's primary metric (§7.1).
  */
final class LatencyHistogram(maxTrackedMs: Long = 60000, bucketMicros: Long = 50) {
  private val numBuckets = (maxTrackedMs * 1000 / bucketMicros).toInt + 1
  private val buckets    = new AtomicLongArray(numBuckets)

  def record(latencyNanos: Long): Unit = {
    val nonNeg = math.max(0L, latencyNanos)
    val idx    = math.min(numBuckets - 1, (nonNeg / (bucketMicros * 1000L)).toInt)
    buckets.incrementAndGet(idx)
    ()
  }

  def count: Long = {
    var s = 0L
    var i = 0
    while (i < numBuckets) { s += buckets.get(i); i += 1 }
    s
  }

  /** Latency (ms) at quantile `p` in [0, 1]. */
  def percentileMs(p: Double): Double = {
    val total = count
    if (total == 0) return 0.0
    val target = math.max(1L, math.ceil(p * total).toLong)
    var seen   = 0L
    var i      = 0
    while (i < numBuckets) {
      seen += buckets.get(i)
      if (seen >= target) return (i + 1) * bucketMicros / 1000.0
      i += 1
    }
    numBuckets * bucketMicros / 1000.0
  }

  def maxMs: Double = {
    var i = numBuckets - 1
    while (i >= 0 && buckets.get(i) == 0) i -= 1
    if (i < 0) 0.0 else (i + 1) * bucketMicros / 1000.0
  }
}

/** Percentile summary of one run. */
final case class LatencyStats(
    count: Long,
    p50: Double,
    p90: Double,
    p99: Double,
    p999: Double,
    p9999: Double,
    max: Double
) {
  def row: String =
    f"n=$count%9d  p50=$p50%8.2fms  p90=$p90%8.2fms  p99=$p99%8.2fms  " +
      f"p99.9=$p999%8.2fms  p99.99=$p9999%8.2fms  max=$max%8.2fms"
}

object LatencyStats {
  def from(h: LatencyHistogram): LatencyStats =
    LatencyStats(h.count, h.percentileMs(0.50), h.percentileMs(0.90), h.percentileMs(0.99),
      h.percentileMs(0.999), h.percentileMs(0.9999), h.maxMs)
}
