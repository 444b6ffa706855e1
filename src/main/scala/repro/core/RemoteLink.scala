package repro.core

import java.util.concurrent.atomic.AtomicLong

/** Adaptive receive-window flow control for a node-to-node link (§3.3).
  *
  * The sender may have at most `ackedProcessed + window − sent` items in
  * flight. The receiver acknowledges every `ackIntervalMs` (100 ms in Jet),
  * at which point the window is resized to `windowMultiplier ×` the items
  * processed in the last interval — Jet's "roughly 300 milliseconds' worth
  * of data" steady state — so a slow receiver shrinks the window and
  * backpressures the sender, while a fast one keeps data always available.
  *
  * In this reproduction the "network" is in-process: the link wraps the
  * same SPSC queues, but every send and every receive goes through this
  * exact protocol.
  */
final class ReceiveWindow(
    val ackIntervalMs: Long = 100,
    val initialWindow: Long = 4096,
    val minWindow: Long = 256,
    val windowMultiplier: Double = 3.0
) {
  private val sent      = new AtomicLong(0)
  private val processed = new AtomicLong(0)

  @volatile private var ackedProcessed = 0L
  @volatile private var window         = initialWindow
  @volatile private var lastAckNanos   = System.nanoTime()

  /** Sender side: reserve a slot if the window allows it. */
  def trySend(): Boolean = {
    if (sent.get() >= ackedProcessed + window) return false
    sent.incrementAndGet()
    true
  }

  /** Sender side: undo a reservation (queue refused the item). */
  def undoSend(): Unit = { sent.decrementAndGet(); () }

  /** Receiver side: `n` items were consumed from the link's queues. */
  def onReceive(n: Int): Unit = {
    processed.addAndGet(n.toLong)
    maybeAck()
  }

  /** Receiver side: send the periodic acknowledgment if it is due. */
  def maybeAck(): Unit = {
    val now = System.nanoTime()
    if (now - lastAckNanos >= ackIntervalMs * 1000000L) {
      val p           = processed.get()
      val inLastRound = p - ackedProcessed
      window = math.max(minWindow, (inLastRound * windowMultiplier).toLong)
      ackedProcessed = p
      lastAckNanos = now
    }
  }

  def inFlight: Long      = sent.get() - processed.get()
  def currentWindow: Long = window
  def unacked: Long       = sent.get() - ackedProcessed
}

/** Sender-side sink of a distributed edge: the SPSC queue to the remote
  * consumer, gated by the link's receive window.
  */
final class FlowControlledSink(val queue: SpscQueue, val link: ReceiveWindow) extends QueueSink {
  def offer(item: AnyRef): Boolean = {
    if (!link.trySend()) return false
    if (queue.offer(item)) true
    else { link.undoSend(); false }
  }
}
