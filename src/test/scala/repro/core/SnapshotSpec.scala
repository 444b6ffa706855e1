package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.pipeline._

/** Fault-tolerance tests (§4.4–4.6): periodic Chandy–Lamport snapshots into
  * the IMDG, node-failure recovery with backup promotion, exactly-once via
  * the two-phase transactional sink, and at-least-once semantics.
  */
class SnapshotSpec extends AnyFunSuite {

  private val Keys = 13

  /** Windowed count over a deterministic finite stream; results go to an
    * exactly-once transactional store.
    */
  private def buildJob(
      store: ResultStore,
      totalEvents: Long,
      pacer: Option[Pacer]
  ): Pipeline = {
    val p = new Pipeline
    p.readFrom[Long](StreamSourceDef(seq => seq, seq => seq / 20, totalEvents, pacer, 10, 1))
      .groupingKey(_ % Keys)
      .window(WindowDef(100, 50))
      .aggregate(AggregateOperations.counting)
      .writeTo(TransactionalSinkDef(store))
    p
  }

  /** The expected multiset of (key, windowEnd, count). */
  private def expected(totalEvents: Long): Map[(Long, Long, Long), Int] = {
    val wd = WindowDef(100, 50)
    (for {
      seq <- 0L until totalEvents
      we  <- Windowing.windowEnds(seq / 20, wd)
    } yield (seq % Keys, we))
      .groupBy(identity)
      .map { case ((k, we), xs) => (k, we, xs.size.toLong) }
      .groupBy(identity)
      .map { case (r, xs) => r -> xs.size }
  }

  private def collected(store: ResultStore): Map[(Long, Long, Long), Int] =
    store.results
      .map { v =>
        val r = v.asInstanceOf[KeyedWindowResult[Long, Long]]
        (r.key, r.windowEnd, r.result)
      }
      .groupBy(identity)
      .map { case (r, xs) => r -> xs.size }

  test("exactly-once without failures produces the exact result set") {
    val inst  = new JetInstance(2, 2)
    try {
      val store = new ResultStore
      val total = 40000L
      val job = inst.submit(
        buildJob(store, total, None).toDag(),
        JobConfig("eo-nofail", Guarantee.ExactlyOnce, snapshotIntervalMs = 100)
      )
      job.awaitCompletion(120000)
      assert(collected(store) == expected(total))
    } finally inst.shutdown()
  }

  test("snapshots complete periodically while a job runs") {
    val inst = new JetInstance(2, 2)
    try {
      val store = new ResultStore
      val pacer = new Pacer(30000)
      val job = inst.submit(
        buildJob(store, 90000L, Some(pacer)).toDag(), // ~3s of wall time
        JobConfig("snap-periodic", Guarantee.ExactlyOnce, snapshotIntervalMs = 200)
      )
      job.awaitCompletion(120000)
      assert(job.snapshotsCompleted >= 3, s"only ${job.snapshotsCompleted} snapshots")
      assert(collected(store) == expected(90000L))
    } finally inst.shutdown()
  }

  test("exactly-once: node failure mid-job recovers to the exact result set") {
    val inst = new JetInstance(3, 2)
    try {
      val store = new ResultStore
      val total = 120000L
      val pacer = new Pacer(40000) // ~3s run
      val job = inst.submit(
        buildJob(store, total, Some(pacer)).toDag(),
        JobConfig("eo-fail", Guarantee.ExactlyOnce, snapshotIntervalMs = 200)
      )
      // Wait for at least two committed snapshots, then kill a member.
      val deadline = System.currentTimeMillis() + 30000
      while (job.snapshotsCompleted < 2 && System.currentTimeMillis() < deadline) Thread.sleep(10)
      assert(job.snapshotsCompleted >= 2, "no snapshots committed before failure injection")
      val victim = inst.nodes.head.id
      val job2   = inst.failNodeAndRecover(job, victim)
      job2.awaitCompletion(180000)
      assert(collected(store) == expected(total))
    } finally inst.shutdown()
  }

  test("at-least-once: failure recovery never loses a window, may duplicate") {
    val inst = new JetInstance(2, 2)
    try {
      val out = new java.util.concurrent.ConcurrentLinkedQueue[KeyedWindowResult[Long, Long]]()
      val total = 100000L
      val pacer = new Pacer(40000)
      val p = new Pipeline
      p.readFrom[Long](StreamSourceDef(seq => seq, seq => seq / 20, total, Some(pacer), 10, 1))
        .groupingKey(_ % Keys)
        .window(WindowDef(100, 50))
        .aggregate(AggregateOperations.counting)
        .writeTo(ForeachSinkDef((v, _) => { out.add(v.asInstanceOf[KeyedWindowResult[Long, Long]]); () }, 1))
      val job = inst.submit(
        p.toDag(),
        JobConfig("alo-fail", Guarantee.AtLeastOnce, snapshotIntervalMs = 200)
      )
      val deadline = System.currentTimeMillis() + 30000
      while (job.snapshotsCompleted < 2 && System.currentTimeMillis() < deadline) Thread.sleep(10)
      assert(job.snapshotsCompleted >= 2)
      val job2 = inst.failNodeAndRecover(job, inst.nodes.head.id)
      job2.awaitCompletion(180000)

      import scala.jdk.CollectionConverters._
      val got = out.asScala.toVector.groupBy(r => (r.key, r.windowEnd))
      val exp = expected(total).keySet.map { case (k, we, cnt) => (k, we) -> cnt }.toMap
      // Every expected window appears, and its (possibly replayed) count is
      // at least the true count.
      exp.foreach { case ((k, we), cnt) =>
        val rs = got.getOrElse((k, we), Vector.empty)
        assert(rs.nonEmpty, s"window ($k,$we) lost")
        assert(rs.map(_.result).max >= cnt, s"window ($k,$we) undercounted: ${rs.map(_.result)} < $cnt")
      }
    } finally inst.shutdown()
  }

  test("transactional sink publishes only committed transactions, idempotently") {
    val store = new ResultStore
    val sink  = new TransactionalSinkP(store)
    sink.init(ProcessorContext(1, "sink", 0, 1, 0))
    val inbox  = new Inbox
    val outbox = new Outbox(Array.empty)
    inbox.add(DataItem("a", 0)); inbox.add(DataItem("b", 0))
    sink.process(0, inbox, outbox)
    assert(store.results.isEmpty, "uncommitted output must not be visible")
    sink.onSnapshot(1)
    assert(store.results.isEmpty, "prepared-but-uncommitted output must not be visible")
    sink.onSnapshotCommitted(1)
    assert(store.results == Vector("a", "b"))
    // Replays of the same transaction are deduplicated.
    store.commitTxn(0, 1, Vector("a", "b"))
    assert(store.results == Vector("a", "b"))
  }

  test("transactional sink restore republishes prepared transactions exactly once") {
    val store = new ResultStore
    val sink  = new TransactionalSinkP(store)
    sink.init(ProcessorContext(1, "sink", 0, 1, 0))
    val inbox  = new Inbox
    val outbox = new Outbox(Array.empty)
    inbox.add(DataItem("x", 0))
    sink.process(0, inbox, outbox)
    sink.onSnapshot(5)
    val state = sink.saveSnapshot().toVector
    // Crash before commit; a new sink restores the prepared txn.
    val sink2 = new TransactionalSinkP(store)
    sink2.init(ProcessorContext(2, "sink", 0, 1, 0))
    sink2.restoreSnapshot(state.iterator)
    assert(store.results == Vector("x"))
    sink2.restoreSnapshot(state.iterator) // idempotent
    assert(store.results == Vector("x"))
  }

  test("generator source snapshots and restores its offset") {
    val src = new GeneratorSourceP(seq => seq, seq => seq, 100, None, 10)
    src.init(ProcessorContext(1, "src", 0, 2, 0))
    val q      = new SpscQueue(64)
    val outbox = new Outbox(Array(new EdgeCollector(Array(new LocalQueueSink(q)), RoutingPolicy.RoundRobin)))
    src.complete(outbox) // emits some events
    val state = src.saveSnapshot().toVector
    val emitted = Iterator.continually(q.poll()).takeWhile(_ != null).collect {
      case DataItem(v: Long, _) => v
    }.toVector
    // A restored instance continues exactly after the snapshot.
    val src2 = new GeneratorSourceP(seq => seq, seq => seq, 100, None, 10)
    src2.init(ProcessorContext(1, "src", 0, 2, 0))
    src2.restoreSnapshot(state.iterator)
    val q2      = new SpscQueue(256)
    val outbox2 = new Outbox(Array(new EdgeCollector(Array(new LocalQueueSink(q2)), RoutingPolicy.RoundRobin)))
    while (!src2.complete(outbox2)) ()
    val emitted2 = Iterator.continually(q2.poll()).takeWhile(_ != null).collect {
      case DataItem(v: Long, _) => v
    }.toVector
    assert((emitted ++ emitted2) == (0L until 100L by 2).toVector)
  }

  test("snapshot state lands in the IMDG and survives node failure") {
    val inst = new JetInstance(3, 2)
    try {
      val store = new ResultStore
      val pacer = new Pacer(30000)
      val job = inst.submit(
        buildJob(store, 90000L, Some(pacer)).toDag(),
        JobConfig("snap-imdg", Guarantee.ExactlyOnce, snapshotIntervalMs = 150)
      )
      val deadline = System.currentTimeMillis() + 30000
      while (job.snapshotsCompleted < 1 && System.currentTimeMillis() < deadline) Thread.sleep(10)
      assert(job.snapshotsCompleted >= 1)
      val committed = inst.grid.getMap[String, Long]("snapmeta-snap-imdg").get("committed")
      assert(committed.exists(_ >= 1))
      val snapMap = inst.grid.getMap[Any, Any](s"snap-snap-imdg-${committed.get % 2}")
      assert(snapMap.size > 0, "committed snapshot map is empty")
      job.cancel()
      job.awaitTerminated()
    } finally inst.shutdown()
  }
}
