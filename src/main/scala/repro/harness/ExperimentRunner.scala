package repro.harness

import repro.core._
import repro.nexmark.{Generator, NexmarkConfig, Queries}
import repro.pipeline.{ForeachSinkDef, Pipeline, SinkDef}

/** Cluster + workload shape of one experiment run (scaled per DESIGN.md). */
final case class RunSpec(
    nodes: Int,
    threadsPerNode: Int,
    ratePerSec: Double,
    durationSec: Double,
    warmupSec: Double = 2.0,
    guarantee: Guarantee = Guarantee.NoGuarantee,
    snapshotIntervalMs: Long = 1000,
    backupCount: Int = 1,
    wmStrideMs: Long = 10,
    sourceLp: Int = 1,
    extraGridMembers: Int = 0
)

/** Drives one query on a fresh Jet cluster simulator and reports the
  * latency distribution or maximum throughput — the harness behind every
  * reproduced table.
  */
object ExperimentRunner {

  /** A query builder: wires source params and the sink into the pipeline. */
  type QueryBuilder = (Pipeline, Queries.StreamParams, SinkDef) => Unit

  /** Run a throttled query and collect the latency distribution.
    *
    * The latency clock follows §7.1: an event (or a window result) is *due*
    * at its event-time's wall-clock deadline under the pacer's schedule;
    * latency is how far past the deadline the sink observed it. Results in
    * the warm-up period are discarded.
    */
  def runLatency(
      spec: RunSpec,
      genCfg: NexmarkConfig,
      query: QueryBuilder,
      jobName: String = "latency-run"
  ): LatencyStats = {
    val inst = new JetInstance(spec.nodes, spec.threadsPerNode, spec.backupCount,
      extraGridMembers = spec.extraGridMembers)
    try {
      val stats = runLatencyOn(inst, spec, genCfg, query, jobName)
      stats
    } finally inst.shutdown()
  }

  /** Same as [[runLatency]] but on a caller-managed instance (lets several
    * concurrent jobs share the cluster for the multi-tenancy table).
    */
  def runLatencyOn(
      inst: JetInstance,
      spec: RunSpec,
      genCfg: NexmarkConfig,
      query: QueryBuilder,
      jobName: String
  ): LatencyStats = {
    val hist = new LatencyHistogram()
    val job  = submitLatencyJob(inst, spec, genCfg, query, jobName, hist)
    job.awaitCompletion(((spec.durationSec + spec.warmupSec) * 1000).toLong + 120000)
    LatencyStats.from(hist)
  }

  /** Submit one throttled, latency-measured job without waiting. */
  def submitLatencyJob(
      inst: JetInstance,
      spec: RunSpec,
      genCfg: NexmarkConfig,
      query: QueryBuilder,
      jobName: String,
      hist: LatencyHistogram
  ): Job = {
    val pacer       = new Pacer(spec.ratePerSec)
    val gen         = new Generator(genCfg.copy(eventsPerSecond = spec.ratePerSec))
    val totalEvents = (spec.ratePerSec * (spec.durationSec + spec.warmupSec)).toLong
    val warmupEndTs = genCfg.t0 + (spec.warmupSec * 1000).toLong
    val sink = ForeachSinkDef(
      (_, ts) =>
        if (ts >= warmupEndTs && ts < Long.MaxValue / 2)
          hist.record(System.nanoTime() - pacer.dueNanos(ts, genCfg.t0)),
      1
    )
    val p = new Pipeline
    query(p, Queries.StreamParams(gen, totalEvents, Some(pacer), spec.wmStrideMs, spec.sourceLp), sink)
    inst.submit(
      p.toDag(),
      JobConfig(jobName, spec.guarantee, spec.snapshotIntervalMs)
    )
  }

  /** Run an *unthrottled* query over `totalEvents` events and report the
    * sustained ingest throughput in events/second (§7.4's metric).
    */
  def runMaxThroughput(
      nodes: Int,
      threadsPerNode: Int,
      totalEvents: Long,
      genCfg: NexmarkConfig,
      query: QueryBuilder,
      wmStrideMs: Long = 100,
      sourceLp: Int = 2
  ): Double = {
    val inst = new JetInstance(nodes, threadsPerNode)
    try {
      val gen  = new Generator(genCfg)
      val p    = new Pipeline
      val sink = ForeachSinkDef((_, _) => (), 1)
      query(p, Queries.StreamParams(gen, totalEvents, None, wmStrideMs, sourceLp), sink)
      val start = System.nanoTime()
      val job   = inst.submit(p.toDag(), JobConfig("throughput-run"))
      job.awaitCompletion(600000)
      val secs = (System.nanoTime() - start) / 1e9
      totalEvents / secs
    } finally inst.shutdown()
  }
}
