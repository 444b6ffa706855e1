package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Tables

/** T2 — Fig. 8 (§7.2): per-query latency at a fixed input rate while the
  * cluster scales out. Shape: stateless Q1/Q2 stay far below the windowed
  * Q5/Q8; the tail stays bounded (tens of ms) at every cluster size.
  */
class T2LatencyScaleOutBench extends AnyFunSuite {

  test("T2: stateless queries stay below windowed queries at every scale") {
    val rows = Tables.t2()
    assert(rows.size == 12)
    rows.foreach { case (_, _, s) => assert(s.count > 0) }
    val byCluster = rows.groupBy(_._2)
    byCluster.foreach { case (nodes, rs) =>
      val q1 = rs.find(_._1 == "Q1").get._3
      val q5 = rs.find(_._1 == "Q5").get._3
      assert(
        q1.p99 <= q5.p9999 + 1.0,
        s"nodes=$nodes: stateless Q1 p99 ${q1.p99}ms above windowed Q5 p99.99 ${q5.p9999}ms"
      )
    }
  }
}
