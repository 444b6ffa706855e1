package repro.nexmark

import org.scalatest.funsuite.AnyFunSuite

class GeneratorSpec extends AnyFunSuite {
  private val gen = new Generator(NexmarkConfig(numPersons = 100, numAuctions = 50, eventsPerSecond = 1000))

  test("event mix is 1 person : 3 auctions : 46 bids per 50 events") {
    val es = gen.events(5000)
    assert(es.count(_.isInstanceOf[Person]) == 100)
    assert(es.count(_.isInstanceOf[Auction]) == 300)
    assert(es.count(_.isInstanceOf[Bid]) == 4600)
  }

  test("generation is deterministic in (seed, seq)") {
    val g2 = new Generator(NexmarkConfig(numPersons = 100, numAuctions = 50, eventsPerSecond = 1000))
    (0L until 1000L).foreach(i => assert(gen.eventOf(i) == g2.eventOf(i)))
  }

  test("different seeds give different streams") {
    val g2 = new Generator(gen.cfg.copy(seed = 43))
    assert((0L until 1000L).exists(i => gen.eventOf(i) != g2.eventOf(i)))
  }

  test("timestamps are non-decreasing and follow the configured rate") {
    val es = gen.events(2000)
    es.sliding(2).foreach { case Vector(a, b) => assert(a.ts <= b.ts); case _ => () }
    assert(gen.tsOf(1000) == 1000L) // 1000 ev/s -> 1ms per event
  }

  test("keys stay within the configured ranges") {
    gen.events(5000).foreach {
      case Person(id, _, _, _)        => assert(id >= 0 && id < 100)
      case Auction(id, s, c, _, _)    => assert(id >= 0 && id < 50 && s >= 0 && s < 100 && c >= 0 && c < 10)
      case Bid(a, b, p, _)            => assert(a >= 0 && a < 50 && b >= 0 && b < 100 && p > 0)
    }
  }

  test("person names are a deterministic function of id") {
    val ps = gen.persons(10000)
    ps.groupBy(_.id).foreach { case (_, xs) => assert(xs.map(_.name).distinct.size == 1) }
  }

  test("all auction keys get used (key-set size drives Q5 output size, §7.3)") {
    val as = gen.bids(20000).map(_.auction).distinct
    assert(as.size == 50)
  }
}
