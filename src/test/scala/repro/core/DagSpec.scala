package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DagSpec extends AnyFunSuite {
  private def noopP() = new ForeachSinkP((_, _) => ())

  test("vertices and edges are registered and queryable") {
    val dag = new Dag
    dag.newVertex("a", noopP _)
    dag.newVertex("b", noopP _)
    dag.edge(EdgeDef("a", 0, "b", 0, RoutingPolicy.RoundRobin, distributed = false))
    assert(dag.vertices.map(_.name) == Vector("a", "b"))
    assert(dag.inboundEdges("b").size == 1)
    assert(dag.outboundEdges("a").size == 1)
    assert(dag.inboundEdges("a").isEmpty)
  }

  test("duplicate vertex names are rejected") {
    val dag = new Dag
    dag.newVertex("a", noopP _)
    intercept[IllegalArgumentException](dag.newVertex("a", noopP _))
  }

  test("edges to unknown vertices are rejected") {
    val dag = new Dag
    dag.newVertex("a", noopP _)
    intercept[IllegalArgumentException](
      dag.edge(EdgeDef("a", 0, "zzz", 0, RoutingPolicy.RoundRobin, distributed = false))
    )
  }

  test("two edges into the same input ordinal are rejected") {
    val dag = new Dag
    dag.newVertex("a", noopP _); dag.newVertex("b", noopP _); dag.newVertex("c", noopP _)
    dag.edge(EdgeDef("a", 0, "c", 0, RoutingPolicy.RoundRobin, distributed = false))
    intercept[IllegalArgumentException](
      dag.edge(EdgeDef("b", 0, "c", 0, RoutingPolicy.RoundRobin, distributed = false))
    )
  }

  test("two-input vertex accepts distinct ordinals") {
    val dag = new Dag
    dag.newVertex("a", noopP _); dag.newVertex("b", noopP _); dag.newVertex("j", noopP _)
    dag.edge(EdgeDef("a", 0, "j", 0, RoutingPolicy.RoundRobin, distributed = false))
    dag.edge(EdgeDef("b", 0, "j", 1, RoutingPolicy.RoundRobin, distributed = false))
    assert(dag.inboundEdges("j").map(_.toOrdinal) == Vector(0, 1))
  }

  test("topological order respects edges") {
    val dag = new Dag
    dag.newVertex("sink", noopP _); dag.newVertex("src", noopP _); dag.newVertex("mid", noopP _)
    dag.edge(EdgeDef("src", 0, "mid", 0, RoutingPolicy.RoundRobin, distributed = false))
    dag.edge(EdgeDef("mid", 0, "sink", 0, RoutingPolicy.RoundRobin, distributed = false))
    val order = dag.topologicalOrder.map(_.name)
    assert(order.indexOf("src") < order.indexOf("mid"))
    assert(order.indexOf("mid") < order.indexOf("sink"))
  }

  test("cycles are rejected") {
    val dag = new Dag
    dag.newVertex("a", noopP _); dag.newVertex("b", noopP _)
    dag.edge(EdgeDef("a", 0, "b", 0, RoutingPolicy.RoundRobin, distributed = false))
    dag.edge(EdgeDef("b", 0, "a", 0, RoutingPolicy.RoundRobin, distributed = false))
    intercept[IllegalArgumentException](dag.topologicalOrder)
  }

  test("default localParallelism is marker value -1") {
    val dag = new Dag
    val v   = dag.newVertex("a", noopP _)
    assert(v.localParallelism == -1)
    val w = dag.newVertex("b", noopP _, localParallelism = 2)
    assert(w.localParallelism == 2)
  }
}
