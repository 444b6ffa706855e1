package repro

import java.util.concurrent.ConcurrentLinkedQueue
import scala.jdk.CollectionConverters._
import repro.core._
import repro.pipeline._

/** Shared helpers for engine tests: run a pipeline on a fresh simulated
  * cluster and collect the sink output.
  */
object TestSupport {

  /** Build a pipeline (given a collecting sink), run it to completion on an
    * `nodes`×`threads` cluster, return everything the sink saw.
    */
  def runCollect(
      nodes: Int,
      threads: Int,
      config: JobConfig = JobConfig()
  )(build: (Pipeline, SinkDef) => Unit): Vector[Any] = {
    val inst = new JetInstance(nodes, threads)
    try {
      val out  = new ConcurrentLinkedQueue[Any]()
      val sink = ForeachSinkDef((v, _) => { out.add(v); () }, 1)
      val p    = new Pipeline
      build(p, sink)
      inst.submit(p.toDag(), config).awaitCompletion(120000)
      out.asScala.toVector
    } finally inst.shutdown()
  }

  /** Run a DAG built directly against the Core API. */
  def runDag(nodes: Int, threads: Int, dag: Dag, config: JobConfig = JobConfig()): Unit = {
    val inst = new JetInstance(nodes, threads)
    try inst.submit(dag, config).awaitCompletion(120000)
    finally inst.shutdown()
  }
}
