package repro.core

import org.scalatest.funsuite.AnyFunSuite

class OutboxSpec extends AnyFunSuite {

  private def drainAll(q: SpscQueue): Vector[AnyRef] = {
    val b = Vector.newBuilder[AnyRef]
    var x = q.poll()
    while (x != null) { b += x; x = q.poll() }
    b.result()
  }

  test("partitioned routing sends a key always to the same sink") {
    val qs     = Array.fill(4)(new SpscQueue(128))
    val sinks  = qs.map(new LocalQueueSink(_): QueueSink)
    val outbox = new Outbox(Array(new EdgeCollector(sinks, RoutingPolicy.Partitioned(identity))))
    (0 until 100).foreach(i => assert(outbox.offer(Long.box(i % 10), 0)))
    val byQueue = qs.map(drainAll)
    // Each key's items all in one queue.
    (0 until 10).foreach { k =>
      val holders = byQueue.zipWithIndex.filter(_._1.exists {
        case DataItem(v, _) => v == Long.box(k)
        case _              => false
      })
      assert(holders.size == 1, s"key $k found in ${holders.size} queues")
    }
  }

  test("round-robin spreads items over sinks") {
    val qs     = Array.fill(3)(new SpscQueue(128))
    val outbox = new Outbox(
      Array(new EdgeCollector(qs.map(new LocalQueueSink(_): QueueSink), RoutingPolicy.RoundRobin))
    )
    (0 until 99).foreach(i => assert(outbox.offer(Int.box(i), 0)))
    qs.foreach(q => assert(q.size == 33))
  }

  test("round-robin skips full sinks") {
    val q0     = new SpscQueue(1)
    val q1     = new SpscQueue(128)
    val outbox = new Outbox(
      Array(new EdgeCollector(Array(new LocalQueueSink(q0), new LocalQueueSink(q1)), RoutingPolicy.RoundRobin))
    )
    (0 until 10).foreach(i => assert(outbox.offer(Int.box(i), 0)))
    assert(outbox.flush())
    assert(q0.size + q1.size == 10)
    assert(q1.size >= 8, s"full sink not skipped: q1=${q1.size}")
  }

  test("broadcast delivers control items to every sink of every edge") {
    val qs1 = Array.fill(2)(new SpscQueue(16))
    val qs2 = Array.fill(3)(new SpscQueue(16))
    val outbox = new Outbox(Array(
      new EdgeCollector(qs1.map(new LocalQueueSink(_): QueueSink), RoutingPolicy.RoundRobin),
      new EdgeCollector(qs2.map(new LocalQueueSink(_): QueueSink), RoutingPolicy.Partitioned(identity))
    ))
    assert(outbox.offerSpecial(Watermark(5)))
    (qs1 ++ qs2).foreach(q => assert(drainAll(q) == Vector(Watermark(5))))
  }

  test("backpressure: offer refuses while parked items remain, order preserved") {
    val q      = new SpscQueue(2)
    val outbox = new Outbox(
      Array(new EdgeCollector(Array(new LocalQueueSink(q)), RoutingPolicy.RoundRobin))
    )
    assert(outbox.offer("a", 0))
    assert(outbox.offer("b", 0))
    assert(outbox.offer("c", 0)) // parked (queue full) but accepted
    assert(outbox.hasPending)
    assert(!outbox.offer("d", 0)) // refused until pending drains
    assert(q.poll().asInstanceOf[DataItem].value == "a")
    assert(outbox.offer("d", 0)) // c flushed into the freed slot, d parked
    assert(q.poll().asInstanceOf[DataItem].value == "b")
    assert(outbox.flush())
    assert(drainAll(q).collect { case DataItem(v, _) => v } == Vector("c", "d"))
  }

  test("broadcast data routing on a Broadcast edge duplicates to all sinks") {
    val qs     = Array.fill(3)(new SpscQueue(16))
    val outbox = new Outbox(
      Array(new EdgeCollector(qs.map(new LocalQueueSink(_): QueueSink), RoutingPolicy.Broadcast))
    )
    assert(outbox.offer("x", 1))
    qs.foreach(q => assert(drainAll(q) == Vector(DataItem("x", 1))))
  }

  test("multi-edge offer fans out to each edge once") {
    val q1 = new SpscQueue(16)
    val q2 = new SpscQueue(16)
    val outbox = new Outbox(Array(
      new EdgeCollector(Array(new LocalQueueSink(q1)), RoutingPolicy.RoundRobin),
      new EdgeCollector(Array(new LocalQueueSink(q2)), RoutingPolicy.RoundRobin)
    ))
    assert(outbox.offer("x", 0))
    assert(q1.size == 1 && q2.size == 1)
  }

  test("acceptedCount tracks successful emissions only") {
    val q      = new SpscQueue(1)
    val outbox = new Outbox(
      Array(new EdgeCollector(Array(new LocalQueueSink(q)), RoutingPolicy.RoundRobin))
    )
    assert(outbox.offer("a", 0))
    assert(outbox.offer("b", 0)) // parked, still accepted
    assert(!outbox.offer("c", 0))
    assert(outbox.acceptedCount == 2)
  }
}
