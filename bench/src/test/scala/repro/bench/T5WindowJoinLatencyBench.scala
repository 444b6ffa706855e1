package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** T5 — Figs. 11–12 (§7.5): latency of Q1/Q2/Q5/Q8/Q13 on the two larger
  * clusters with fault tolerance off. Shape: pure map/filter (Q1/Q2) and
  * the stateless hash-join probe (Q13) sit at ~ms-scale; the windowed
  * aggregate and join (Q5/Q8) sit an order of magnitude above (the paper:
  * ≤1 ms vs 11–12 ms p99.99).
  */
class T5WindowJoinLatencyBench extends AnyFunSuite {

  test("T5: windowed queries dominate the tail; stateless queries stay low") {
    val rows = Tables.t5()
    assert(rows.size == 10)
    rows.foreach { case (_, _, s) => assert(s.count > 0) }
    Seq(2, 4).foreach { nodes =>
      val rs = rows.filter(_._2 == nodes)
      val q1 = rs.find(_._1 == "Q1").get._3
      val q5 = rs.find(_._1 == "Q5").get._3
      val q8 = rs.find(_._1 == "Q8").get._3
      assert(q1.p50 <= q5.p9999 + 1.0, s"nodes=$nodes: Q1 not below Q5 tail")
      assert(q1.p50 <= q8.p9999 + 1.0, s"nodes=$nodes: Q1 not below Q8 tail")
    }
  }
}
