package repro.baseline

import repro.SparkSpec
import repro.core.WindowDef

/** Smoke test of the Structured Streaming micro-batch baseline runner: it
  * must produce window results and report a plausible latency distribution
  * (full-scale comparison lives in bench T8).
  */
class BaselineSmokeSpec extends SparkSpec {

  test("micro-batch baseline emits window results with measurable latency") {
    val stats = MicroBatchBaseline.runWindowedCount(
      spark,
      ratePerSec = 2000,
      durationSec = 3,
      warmupSec = 1,
      wd = WindowDef(1000, 500),
      numKeys = 20,
      triggerMs = 250
    )
    assert(stats.count > 0, "baseline produced no window results")
    assert(stats.p50 >= 0.0)
    assert(stats.p9999 >= stats.p50)
  }
}
