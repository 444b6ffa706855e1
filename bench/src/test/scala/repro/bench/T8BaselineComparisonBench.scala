package repro.bench

import repro.SparkSpec
import repro.harness.Tables

/** T8 — the paper's premise (§1, [18]): the identical windowed count on the
  * Jet engine vs Spark Structured Streaming's micro-batch engine. Shape:
  * the micro-batch tail sits a multiple above the tasklet engine's.
  */
class T8BaselineComparisonBench extends SparkSpec {

  test("T8: micro-batch p99.99 sits well above the Jet engine's") {
    val (jet, ss) = Tables.t8(spark)
    assert(jet.count > 0 && ss.count > 0)
    assert(
      ss.p9999 > jet.p9999 * 2,
      f"expected micro-batch tail >> jet tail, got ss=${ss.p9999}%.1fms jet=${jet.p9999}%.1fms"
    )
  }
}
