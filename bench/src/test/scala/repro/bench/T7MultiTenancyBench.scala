package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** T7 — §7.7: many concurrent Q5 jobs sharing one node's cooperative
  * threads. Shape: all jobs complete and the aggregate tail stays bounded
  * (the paper: 100 jobs at 1 M ev/s aggregate → ~200 ms p99.99, i.e.
  * elevated vs a single job but far from collapse).
  */
class T7MultiTenancyBench extends AnyFunSuite {

  test("T7: 20 concurrent jobs on one node complete with a bounded tail") {
    val stats = Tables.t7()
    assert(stats.count > 0, "no samples from the multi-tenant run")
    assert(stats.p9999 < 10000, f"multi-tenant tail collapsed: ${stats.p9999}%.1fms")
  }
}
