package repro.core

/** Identity and placement of one parallel processor instance. */
final case class ProcessorContext(
    jobId: Long,
    vertexName: String,
    globalIndex: Int,
    totalParallelism: Int,
    nodeId: Int
)

/** The unit of computation at a DAG vertex (§3.2 "Jet Processors").
  *
  * A processor is driven entirely by its tasklet and must never block: every
  * method does a bounded amount of work and returns. Backpressure is
  * expressed by the outbox refusing an emission — the processor then leaves
  * the remaining input in the inbox (or keeps its own emission cursor) and
  * the tasklet retries on a later call.
  */
trait Processor {

  def init(ctx: ProcessorContext): Unit = ()

  /** Consume items from `inbox` (input edge `ordinal`), emitting to
    * `outbox`. Stop early — leaving items in the inbox — as soon as the
    * outbox refuses an emission.
    */
  def process(ordinal: Int, inbox: Inbox, outbox: Outbox): Unit

  /** The coalesced event-time of all inputs advanced to `wm`. Emit any
    * closed windows; return true only when all results for this watermark
    * have been accepted by the outbox (the tasklet re-invokes otherwise,
    * and forwards the watermark downstream once true).
    */
  def tryProcessWatermark(wm: Watermark, outbox: Outbox): Boolean = true

  /** Called once all inputs are exhausted (finite streams), repeatedly
    * until it returns true. Source processors live entirely in `complete`.
    */
  def complete(outbox: Outbox): Boolean = true

  /** A snapshot barrier reached this processor (before `saveSnapshot`).
    * Transactional sinks use this to seal the current transaction (§4.5).
    */
  def onSnapshot(snapshotId: Long): Unit = ()

  /** Snapshot `snapshotId` completed cluster-wide — the second phase of the
    * sink's two-phase commit (§4.5).
    */
  def onSnapshotCommitted(snapshotId: Long): Unit = ()

  /** State entries for a checkpoint (§4.4). Must be safe to retain after
    * the call (copy mutable accumulators).
    */
  def saveSnapshot(): Iterator[(Any, Any)] = Iterator.empty

  /** Restore this instance's share of a checkpoint. */
  def restoreSnapshot(entries: Iterator[(Any, Any)]): Unit = ()
}
