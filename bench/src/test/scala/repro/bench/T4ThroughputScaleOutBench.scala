package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** T4 — Fig. 10 (§7.4): maximum Q5 ingest throughput with a wide (500 ms)
  * slide as the cluster grows. Shape: throughput grows with nodes — the
  * two-stage combine keeps cross-node data bounded by the key count, so
  * scale-out is near-linear in the paper (12 → 240 cores, 468 M ev/s).
  */
class T4ThroughputScaleOutBench extends AnyFunSuite {

  test("T4: throughput grows when the cluster grows") {
    val rows = Tables.t4()
    assert(rows.size == 3)
    rows.foreach { case (_, thr) => assert(thr > 0) }
    val single = rows.find(_._1 == 1).get._2
    // The simulated cluster shares one machine's 16 cores, so scaling is
    // noisy and sub-linear; the shape check is that *some* larger cluster
    // clearly beats one node.
    val bestMulti = rows.filter(_._1 > 1).map(_._2).max
    assert(bestMulti > single * 1.2,
      f"no scale-out: 1 node $single%.0f ev/s vs best multi-node $bestMulti%.0f ev/s")
  }
}
