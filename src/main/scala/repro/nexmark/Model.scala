package repro.nexmark

/** NEXMark entities (§7.1): people create auctions; bids arrive on
  * auctions. Timestamps are event-time milliseconds.
  */
sealed trait Event { def ts: Long }
final case class Person(id: Long, name: String, state: String, ts: Long) extends Event
final case class Auction(id: Long, seller: Long, category: Int, reserve: Double, ts: Long)
    extends Event
final case class Bid(auction: Long, bidder: Long, price: Double, ts: Long) extends Event

/** Query result rows (scalar columns so the DuckDB oracle can diff them). */
final case class Q1Out(auction: Long, bidder: Long, price: Double, ts: Long)
final case class Q2Out(auction: Long, price: Double)
final case class Q5Out(windowEnd: Long, auction: Long, cnt: Long)
final case class Q8Out(person: Long, name: String, windowEnd: Long)
final case class Q13Out(auction: Long, price: Double, category: String)
