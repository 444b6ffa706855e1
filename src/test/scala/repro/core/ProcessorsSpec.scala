package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests of the stock processors driven directly (no scheduler). */
class ProcessorsSpec extends AnyFunSuite {

  private def outboxTo(q: SpscQueue) =
    new Outbox(Array(new EdgeCollector(Array(new LocalQueueSink(q)), RoutingPolicy.RoundRobin)))

  private def drainValues(q: SpscQueue): Vector[Any] =
    Iterator.continually(q.poll()).takeWhile(_ != null).collect { case DataItem(v, _) => v }.toVector

  test("FusedStatelessP applies the fused function per item") {
    val q = new SpscQueue(64)
    val p = new FusedStatelessP(v => Iterator(v, s"${v}x"))
    val inbox = new Inbox
    inbox.add(DataItem("a", 1)); inbox.add(DataItem("b", 2))
    p.process(0, inbox, outboxTo(q))
    assert(drainValues(q) == Vector("a", "ax", "b", "bx"))
  }

  test("FusedStatelessP pauses on a full outbox and resumes without loss") {
    val q = new SpscQueue(2)
    val outbox = outboxTo(q)
    val p = new FusedStatelessP(v => Iterator(v, v, v, v))
    val inbox = new Inbox
    inbox.add(DataItem("a", 1))
    p.process(0, inbox, outbox)
    var collected = Vector.empty[Any]
    var spins     = 0
    while (collected.size < 4 && spins < 100) {
      collected ++= drainValues(q)
      outbox.flush()
      p.complete(outbox)
      spins += 1
    }
    collected ++= drainValues(q)
    assert(collected == Vector("a", "a", "a", "a"))
  }

  test("FusedStatelessP.complete drains leftover expansion") {
    val q = new SpscQueue(1)
    val outbox = outboxTo(q)
    val p = new FusedStatelessP(v => Iterator(1, 2, 3))
    val inbox = new Inbox
    inbox.add(DataItem("x", 0))
    p.process(0, inbox, outbox)
    assert(!p.complete(outbox)) // item 3 still held by the processor
    assert(drainValues(q) == Vector(1))
    outbox.flush() // delivers the parked 2
    assert(drainValues(q) == Vector(2))
    assert(p.complete(outbox)) // queue has room again: 3 goes straight in
    assert(drainValues(q) == Vector(3))
    assert(p.complete(outbox))
  }

  test("HashJoinP builds on ordinal 0 and probes on ordinal 1") {
    val q = new SpscQueue(64)
    val outbox = outboxTo(q)
    val p = new HashJoinP(
      v => v.asInstanceOf[(Int, String)]._1,
      v => v.asInstanceOf[Int],
      (probe, ms) => ms.iterator.map(m => (probe, m.asInstanceOf[(Int, String)]._2))
    )
    val inbox = new Inbox
    inbox.add(DataItem((1, "one"), 0)); inbox.add(DataItem((2, "two"), 0))
    p.process(0, inbox, outbox)
    inbox.add(DataItem(1, 0)); inbox.add(DataItem(3, 0)); inbox.add(DataItem(2, 0))
    p.process(1, inbox, outbox)
    assert(p.complete(outbox))
    assert(drainValues(q) == Vector((1, "one"), (2, "two")))
  }

  test("HashJoinP supports duplicate build keys (all matches emitted)") {
    val q = new SpscQueue(64)
    val outbox = outboxTo(q)
    val p = new HashJoinP(
      v => v.asInstanceOf[(Int, String)]._1,
      v => v.asInstanceOf[Int],
      (probe, ms) => ms.iterator.map(m => m.asInstanceOf[(Int, String)]._2)
    )
    val inbox = new Inbox
    inbox.add(DataItem((1, "a"), 0)); inbox.add(DataItem((1, "b"), 0))
    p.process(0, inbox, outbox)
    inbox.add(DataItem(1, 0))
    p.process(1, inbox, outbox)
    assert(drainValues(q).toSet == Set("a", "b"))
  }

  test("BatchSourceP splits data round-robin over instances") {
    val data = (0 until 100).toVector
    val got = (0 until 3).flatMap { i =>
      val p = new BatchSourceP(data.map(x => x: Any))
      p.init(ProcessorContext(1, "s", i, 3, 0))
      val q = new SpscQueue(256)
      val outbox = outboxTo(q)
      while (!p.complete(outbox)) ()
      drainValues(q).map(_.asInstanceOf[Int])
    }
    assert(got.sorted == (0 until 100).toVector)
  }

  test("AccumulateBatchP + CombineBatchP compute grouped sums") {
    val q1 = new SpscQueue(1024)
    val acc = new AccumulateBatchP(
      v => v.asInstanceOf[(String, Long)]._1,
      AggregateOperations.summingLong(v => v.asInstanceOf[(String, Long)]._2)
    )
    val inbox = new Inbox
    Seq(("a", 1L), ("b", 2L), ("a", 3L)).foreach(x => inbox.add(DataItem(x, 0)))
    val ob1 = outboxTo(q1)
    acc.process(0, inbox, ob1)
    assert(acc.complete(ob1))

    val q2 = new SpscQueue(1024)
    val comb = new CombineBatchP(AggregateOperations.summingLong(v => v.asInstanceOf[(String, Long)]._2))
    drainValues(q1).foreach(x => inbox.add(DataItem(x, 0)))
    val ob2 = outboxTo(q2)
    comb.process(0, inbox, ob2)
    assert(comb.complete(ob2))
    assert(drainValues(q2).toSet == Set(("a", 4L), ("b", 2L)))
  }

  test("GeneratorSourceP emits a watermark before newer-stride events") {
    val p = new GeneratorSourceP(seq => seq, seq => seq * 10, 10, None, wmStrideMs = 20)
    p.init(ProcessorContext(1, "src", 0, 1, 0))
    val q = new SpscQueue(256)
    val outbox = outboxTo(q)
    while (!p.complete(outbox)) ()
    val items = Iterator.continually(q.poll()).takeWhile(_ != null).toVector
    // Every data item must be preceded by a watermark covering its stride.
    var wm = Long.MinValue
    items.foreach {
      case Watermark(ts)   => assert(ts >= wm); wm = ts
      case DataItem(_, ts) => assert(ts >= wm, s"event ts=$ts before watermark $wm")
      case Done            => ()
      case other           => fail(s"unexpected $other")
    }
    assert(wm == Long.MaxValue, "final watermark missing")
  }

  test("Pacer enforces the configured rate") {
    val p = new Pacer(1000.0) // 1000 ev/s
    p.start()
    assert(!p.allowed(500), "seq 500 must not be allowed immediately at 1000 ev/s")
    Thread.sleep(60)
    assert(p.allowed(10)) // ~60 events allowed after 60 ms
    assert(!p.allowed(1000))
  }

  test("Pacer dueNanos maps event time to the wall clock linearly") {
    val p  = new Pacer(1000.0)
    val t0 = p.start()
    assert(p.dueNanos(100, 0) == t0 + 100000000L)
    assert(p.dueNanos(250, 50) == t0 + 200000000L)
  }

  test("SkewGuard blocks a fast instance and never the slowest") {
    val g = new SkewGuard(100)
    assert(g.mayEmit(0, 2, 0))     // nothing known yet
    assert(g.mayEmit(1, 2, 50))    // within 100ms of instance 0 at ts 0
    assert(!g.mayEmit(1, 2, 500))  // 500 - 100 > 0 -> blocked
    assert(g.mayEmit(0, 2, 450))   // the slowest instance always advances
    assert(g.mayEmit(1, 2, 500))   // now within bound again
  }

  test("SkewGuard ignores finished instances") {
    val g = new SkewGuard(100)
    assert(g.mayEmit(0, 2, 10))
    g.finished(0, 2)
    assert(g.mayEmit(1, 2, 1000000), "finished instance must not hold others back")
  }

  test("ResultStore commits are idempotent and ordered by (txn, sink)") {
    val s = new ResultStore
    s.commitTxn(0, 2, Vector("c"))
    s.commitTxn(0, 1, Vector("a", "b"))
    s.commitTxn(0, 1, Vector("SHOULD", "NOT", "APPLY"))
    assert(s.results == Vector("a", "b", "c"))
    assert(s.txnCount == 2)
  }
}
