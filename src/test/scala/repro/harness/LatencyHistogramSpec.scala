package repro.harness

import org.scalatest.funsuite.AnyFunSuite

class LatencyHistogramSpec extends AnyFunSuite {

  test("empty histogram reports zeros") {
    val h = new LatencyHistogram()
    assert(h.count == 0)
    assert(h.percentileMs(0.99) == 0.0)
    assert(h.maxMs == 0.0)
  }

  test("percentiles of a uniform distribution are proportional") {
    val h = new LatencyHistogram()
    (1 to 10000).foreach(i => h.record(i * 1000000L)) // 1..10000 ms
    assert(h.count == 10000)
    assert(math.abs(h.percentileMs(0.5) - 5000) < 10)
    assert(math.abs(h.percentileMs(0.99) - 9900) < 10)
    assert(math.abs(h.percentileMs(0.9999) - 10000) < 10)
  }

  test("negative latencies clamp to zero-bucket") {
    val h = new LatencyHistogram()
    h.record(-5000000L)
    assert(h.count == 1)
    assert(h.percentileMs(0.5) <= 0.1)
  }

  test("latencies beyond the tracked max land in the last bucket") {
    val h = new LatencyHistogram(maxTrackedMs = 10)
    h.record(3600L * 1000000000L)
    assert(h.count == 1)
    assert(h.maxMs >= 10.0)
  }

  test("p99.99 picks out a 1-in-10000 outlier") {
    val h = new LatencyHistogram()
    (1 to 9998).foreach(_ => h.record(1000000L)) // 1 ms
    (1 to 2).foreach(_ => h.record(500000000L))  // 500 ms outliers (2 in 10000)
    assert(h.percentileMs(0.5) < 2.0)
    assert(h.percentileMs(0.9999) >= 500.0)
  }

  test("concurrent recording is lossless") {
    val h  = new LatencyHistogram()
    val ts = (0 until 4).map(_ => new Thread(() => (1 to 100000).foreach(_ => h.record(1000000L))))
    ts.foreach(_.start()); ts.foreach(_.join(10000))
    assert(h.count == 400000)
  }

  test("LatencyStats.from summarizes a histogram") {
    val h = new LatencyHistogram()
    (1 to 1000).foreach(i => h.record(i * 1000000L))
    val s = LatencyStats.from(h)
    assert(s.count == 1000)
    assert(s.p50 < s.p99 && s.p99 <= s.p9999 && s.p9999 <= s.max)
    assert(s.row.contains("p99.99"))
  }
}
