package repro.nexmark

/** Deterministic NEXMark event generator.
  *
  * Uses the standard NEXMark mix — of every 50 events, 1 is a person, 3 are
  * auctions, 46 are bids — and the paper's key model: a configurable number
  * of distinct person and auction keys drawn (pseudo-)randomly (§7.1 uses
  * 10 000 of each; the scaled runs here use fewer, see DESIGN.md).
  *
  * Everything is a pure function of (seed, seq), which makes the source
  * *replayable* (§4.5): replaying from a snapshotted offset regenerates the
  * identical events, and the Spark/DuckDB oracles can regenerate the exact
  * input for verification.
  */
final case class NexmarkConfig(
    numPersons: Int = 1000,
    numAuctions: Int = 1000,
    eventsPerSecond: Double = 100000.0, // event-time density of timestamps
    t0: Long = 0L,
    seed: Long = 42L
)

final class Generator(val cfg: NexmarkConfig) extends Serializable {

  private val States = Array("OR", "ID", "CA", "NY", "WA", "TX", "AZ", "MA")

  /** splitmix64 — decorrelates consecutive sequence numbers. */
  private def mix(seq: Long, salt: Long): Long = {
    var z = seq + salt * 0x9e3779b97f4a7c15L + cfg.seed * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    (z ^ (z >>> 31)) & Long.MaxValue
  }

  /** Event timestamp of global sequence number `seq`. */
  def tsOf(seq: Long): Long = cfg.t0 + (seq * 1000.0 / cfg.eventsPerSecond).toLong

  def nameOf(personId: Long): String = s"person-$personId"

  /** The event at global sequence number `seq` (1 person : 3 auctions :
    * 46 bids per 50-event block).
    */
  def eventOf(seq: Long): Event = {
    val slot = seq % 50
    val ts   = tsOf(seq)
    if (slot == 0) {
      val id = mix(seq, 1) % cfg.numPersons
      Person(id, nameOf(id), States((mix(seq, 2) % States.length).toInt), ts)
    } else if (slot <= 3) {
      val id     = mix(seq, 3) % cfg.numAuctions
      val seller = mix(seq, 4) % cfg.numPersons
      Auction(id, seller, (mix(seq, 5) % 10).toInt, (mix(seq, 6) % 10000).toDouble / 100.0, ts)
    } else {
      val auction = mix(seq, 7) % cfg.numAuctions
      val bidder  = mix(seq, 8) % cfg.numPersons
      Bid(auction, bidder, (1 + mix(seq, 9) % 100000).toDouble / 100.0, ts)
    }
  }

  /** Materialize the first `n` events (for oracles and tests). */
  def events(n: Long): Vector[Event] = (0L until n).map(eventOf).toVector
  def bids(n: Long): Vector[Bid]         = events(n).collect { case b: Bid => b }
  def persons(n: Long): Vector[Person]   = events(n).collect { case p: Person => p }
  def auctions(n: Long): Vector[Auction] = events(n).collect { case a: Auction => a }
}
