package repro.nexmark

import repro.core._
import repro.pipeline._

/** NEXMark queries 1, 2, 5, 8 and 13 as Jet pipelines — the workload of the
  * paper's evaluation (§7.1). Each builder wires a generator source, the
  * query stages and the given sink into `p`.
  */
object Queries {

  /** Stream source parameters shared by all queries. */
  final case class StreamParams(
      gen: Generator,
      numEvents: Long,
      pacer: Option[Pacer] = None,
      wmStrideMs: Long = 10,
      sourceLp: Int = 1
  )

  /** The raw event stream. */
  def eventSource(p: Pipeline, sp: StreamParams): StreamStage[Event] =
    p.readFrom[Event](
      StreamSourceDef(
        seq => sp.gen.eventOf(seq),
        seq => sp.gen.tsOf(seq),
        sp.numEvents,
        sp.pacer,
        sp.wmStrideMs,
        sp.sourceLp
      )
    )

  def bids(p: Pipeline, sp: StreamParams): StreamStage[Bid] =
    eventSource(p, sp).flatMap { case b: Bid => b :: Nil; case _ => Nil }

  /** Q1 — currency conversion: a pure map over the bid stream. */
  def q1(p: Pipeline, sp: StreamParams, sink: SinkDef): Unit =
    bids(p, sp).map(b => Q1Out(b.auction, b.bidder, b.price * 0.908, b.ts)).writeTo(sink)

  /** Q2 — selection: bids on a subset of auction ids. */
  def q2(p: Pipeline, sp: StreamParams, sink: SinkDef, mod: Long = 123): Unit =
    bids(p, sp).filter(_.auction % mod == 0).map(b => Q2Out(b.auction, b.price)).writeTo(sink)

  /** Q5 — hot items: sliding-window count of bids per auction, then the
    * auctions with the highest count per window (ties included).
    */
  def q5(p: Pipeline, sp: StreamParams, wd: WindowDef, sink: SinkDef): Unit =
    bids(p, sp)
      .groupingKey(_.auction)
      .window(wd)
      .aggregate(AggregateOperations.counting)
      .windowEndAggregate[Q5Out] { (we, results) =>
        if (results.isEmpty) Iterator.empty
        else {
          val mx = results.iterator.map(_.result).max
          results.iterator.filter(_.result == mx).map(r => Q5Out(we, r.key, r.result))
        }
      }
      .writeTo(sink)

  /** Q5 with the latency probe at the *aggregating stage's* output — the
    * paper's latency clock stops "when Jet has started emitting the window
    * results" (§7.1), i.e. at the windowed aggregation, and one window
    * yields one result per key, giving dense tail samples. The max stage
    * still runs (into `rest`) so the full query executes.
    */
  def q5Measured(
      p: Pipeline,
      sp: StreamParams,
      wd: WindowDef,
      measureSink: SinkDef,
      rest: SinkDef
  ): Unit = {
    val agg = bids(p, sp)
      .groupingKey(_.auction)
      .window(wd)
      .aggregate(AggregateOperations.counting)
    agg.writeTo(measureSink)
    agg
      .windowEndAggregate[Q5Out] { (we, results) =>
        if (results.isEmpty) Iterator.empty
        else {
          val mx = results.iterator.map(_.result).max
          results.iterator.filter(_.result == mx).map(r => Q5Out(we, r.key, r.result))
        }
      }
      .writeTo(rest)
  }

  /** Q8 — monitor new users: persons who created an auction within the same
    * window (windowed stream-to-stream join on person id = auction seller).
    */
  def q8(p: Pipeline, sp: StreamParams, wd: WindowDef, sink: SinkDef): Unit = {
    val events   = eventSource(p, sp)
    val persons  = events.flatMap { case x: Person => x :: Nil; case _ => Nil }
    val auctions = events.flatMap { case x: Auction => x :: Nil; case _ => Nil }
    persons
      .windowJoin[Auction, Long, Q8Out](
        auctions,
        _.id,
        _.seller,
        wd,
        (personId, ps, _, we) => Iterator.single(Q8Out(personId, ps.head.name, we))
      )
      .writeTo(sink)
  }

  /** Q13 — bounded side-input join: enrich each bid with a static table
    * keyed by auction id (the hybrid batch+stream hash join of Listing 2).
    */
  def q13(p: Pipeline, sp: StreamParams, sink: SinkDef): Unit = {
    val side = p.readFrom[(Long, String)](
      BatchSourceDef(
        (0L until sp.gen.cfg.numAuctions.toLong).map(id => (id, s"cat-${id % 10}")).toVector
      )
    )
    bids(p, sp)
      .hashJoin[(Long, String), Long, Q13Out](
        side,
        _.auction,
        _._1,
        (b, ms) => ms.iterator.map(m => Q13Out(b.auction, b.price, m._2))
      )
      .writeTo(sink)
  }
}
