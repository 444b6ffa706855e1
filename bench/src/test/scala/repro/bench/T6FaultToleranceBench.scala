package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** T6 — Fig. 13 (§7.6): Q5 latency with exactly-once checkpoints every
  * second (replicated into the IMDG) versus fault tolerance off. Shape:
  * checkpointing multiplies the tail — the paper reports ~350 ms p99.99
  * with snapshots vs ~13–17 ms without, which motivates the active-active
  * deployment trade-off of §4.6.
  */
class T6FaultToleranceBench extends AnyFunSuite {

  test("T6: exactly-once checkpoints inflate the latency tail") {
    val (off, on) = Tables.t6()
    assert(off.count > 0 && on.count > 0)
    // The snapshot pauses recur every 500 ms, so their signature is a large
    // jump at p99 (many samples) — far more stable on a shared machine than
    // the p99.99 single-episode tail, which is also reported.
    assert(
      on.p99 > off.p99 * 1.5,
      f"checkpoint overhead invisible: FT-on median p99 ${on.p99}%.2fms vs FT-off ${off.p99}%.2fms"
    )
    assert(on.p9999 >= off.p99, "FT-on tail below FT-off p99 — implausible")
  }
}
