package repro.core

import repro.imdg.Partitioning

/** Destination a producer can push stream items into: either a plain local
  * SPSC queue or a flow-controlled remote link (§3.3).
  */
trait QueueSink {
  def offer(item: AnyRef): Boolean
}

/** Sink over a same-member SPSC queue. */
final class LocalQueueSink(val queue: SpscQueue) extends QueueSink {
  def offer(item: AnyRef): Boolean = queue.offer(item)
}

/** How an edge routes data items to the consumer instances (§2.2). */
sealed trait RoutingPolicy
object RoutingPolicy {
  /** Any consumer — items spread round-robin, skipping full queues. */
  case object RoundRobin extends RoutingPolicy
  /** Key-partitioned: `keyFn(item)` decides the owning consumer, aligned
    * with the IMDG partitioning (§4.1).
    */
  final case class Partitioned(keyFn: Any => Any) extends RoutingPolicy
  /** Every consumer receives every item (e.g. a hash-join build side). */
  case object Broadcast extends RoutingPolicy
}

/** Routes one producer's output over one edge to that edge's consumer sinks.
  *
  * Items that a full sink refuses are parked in the outbox's shared pending
  * queue; the outbox refuses further emissions until they are delivered,
  * which is what propagates backpressure to the processor (§3.3).
  */
final class EdgeCollector(val sinks: Array[QueueSink], val routing: RoutingPolicy) {
  require(sinks.nonEmpty, "edge with no consumers")
  private var rrCursor = 0

  private[core] def route(item: DataItem, pending: java.util.ArrayDeque[(QueueSink, AnyRef)]): Unit =
    routing match {
      case RoutingPolicy.Partitioned(keyFn) =>
        val sink = sinks(Partitioning.consumerIndex(keyFn(item.value), sinks.length))
        if (!sink.offer(item)) pending.add((sink, item))
      case RoutingPolicy.RoundRobin =>
        var tried = 0
        var done  = false
        while (!done && tried < sinks.length) {
          val sink = sinks(rrCursor)
          rrCursor = (rrCursor + 1) % sinks.length
          if (sink.offer(item)) done = true
          tried += 1
        }
        if (!done) {
          // All full: park on the next cursor position to preserve fairness.
          val sink = sinks(rrCursor)
          rrCursor = (rrCursor + 1) % sinks.length
          pending.add((sink, item))
        }
      case RoutingPolicy.Broadcast =>
        broadcast(item, pending)
    }

  private[core] def broadcast(item: AnyRef, pending: java.util.ArrayDeque[(QueueSink, AnyRef)]): Unit = {
    var i = 0
    while (i < sinks.length) {
      val sink = sinks(i)
      if (!sink.offer(item)) pending.add((sink, item))
      i += 1
    }
  }
}

/** A processor's output port: fans emissions out over all outbound edges.
  *
  * The contract mirrors Jet's: `offer` returns false when earlier items are
  * still undeliverable, and the processor must stop consuming input — the
  * bounded queues plus this refusal are the entire local backpressure
  * mechanism (§3.3). Control items (watermarks, barriers, Done) broadcast
  * to every consumer of every edge.
  */
final class Outbox(val edges: Array[EdgeCollector]) {
  private val pending = new java.util.ArrayDeque[(QueueSink, AnyRef)]()

  /** Accepted emissions — lets the tasklet detect whether a `complete()`
    * call made progress.
    */
  private var accepted = 0L
  def acceptedCount: Long = accepted

  /** Deliver parked items; true when none remain. */
  def flush(): Boolean = {
    while (!pending.isEmpty) {
      val (sink, item) = pending.peekFirst()
      if (sink.offer(item)) pending.removeFirst()
      else return false
    }
    true
  }

  /** Emit a data item with event timestamp `ts` on all edges. False means
    * "try again later, nothing was accepted".
    */
  def offer(value: Any, ts: Long): Boolean = {
    if (!flush()) return false
    val item = DataItem(value, ts)
    var e = 0
    while (e < edges.length) { edges(e).route(item, pending); e += 1 }
    accepted += 1
    true
  }

  /** Broadcast a control item (watermark / barrier / Done) to all consumers. */
  def offerSpecial(item: StreamItem): Boolean = {
    if (!flush()) return false
    var e = 0
    while (e < edges.length) { edges(e).broadcast(item, pending); e += 1 }
    accepted += 1
    true
  }

  def hasPending: Boolean = !pending.isEmpty
  def edgeCount: Int      = edges.length
}

/** Ordered buffer of data items a tasklet has drained for its processor. */
final class Inbox {
  private val q = new java.util.ArrayDeque[DataItem]()

  def add(item: DataItem): Unit = q.addLast(item)
  def peek(): DataItem          = q.peekFirst()
  def poll(): DataItem          = q.pollFirst()
  def remove(): Unit            = { q.removeFirst(); () }
  def isEmpty: Boolean          = q.isEmpty
  def nonEmpty: Boolean         = !q.isEmpty
  def size: Int                 = q.size
  def clear(): Unit             = q.clear()
}
