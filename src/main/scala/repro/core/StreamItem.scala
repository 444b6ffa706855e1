package repro.core

/** Items that flow through the queues between tasklets.
  *
  * Besides user data, the stream carries two control items: watermarks
  * (event-time progress, enabling out-of-order handling) and snapshot
  * barriers (Chandy–Lamport checkpoint markers, §4.4 of the paper). `Done`
  * marks stream end for finite (batch) inputs.
  */
sealed trait StreamItem

/** A data record with its event timestamp in milliseconds. */
final case class DataItem(value: Any, timestamp: Long) extends StreamItem

/** Event-time has advanced to `ts`: no data item with a smaller timestamp
  * will follow on this channel.
  */
final case class Watermark(ts: Long) extends StreamItem

/** Checkpoint barrier for snapshot `snapshotId` (§4.4). */
final case class SnapshotBarrier(snapshotId: Long) extends StreamItem

/** End-of-stream marker for finite inputs. */
case object Done extends StreamItem

/** Partial aggregate of one window frame, exchanged between the local
  * accumulate stage and the distributed combine stage (§3.1's two-stage
  * aggregation).
  */
final case class FrameAggregate[K, A](key: K, frameEnd: Long, acc: A)

/** One key's result for the window ending at `windowEnd`. */
final case class KeyedWindowResult[K, R](key: K, windowEnd: Long, result: R)
