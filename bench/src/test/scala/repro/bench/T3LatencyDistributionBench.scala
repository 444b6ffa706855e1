package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** T3 — Fig. 9 (§7.2): full latency distribution (p50…p99.99) of all five
  * queries at the largest simulated DOP. Shape: distributions are heavily
  * front-loaded — the median sits far below the p99.99 tail.
  */
class T3LatencyDistributionBench extends AnyFunSuite {

  test("T3: distributions are front-loaded and percentiles are monotone") {
    val rows = Tables.t3()
    assert(rows.size == 5)
    rows.foreach { case (qn, s) =>
      assert(s.count > 0, s"$qn recorded no samples")
      assert(s.p50 <= s.p90 && s.p90 <= s.p99 && s.p99 <= s.p999 && s.p999 <= s.p9999,
        s"$qn percentiles not monotone: $s")
    }
    val q1 = rows.find(_._1 == "Q1").get._2
    assert(q1.p50 <= q1.p9999, "degenerate distribution")
  }
}
