package repro.nexmark

import repro.{Oracle, SparkSpec, TestSupport}
import repro.core.{Guarantee, JobConfig, WindowDef}
import repro.pipeline.{Pipeline, SinkDef}

/** End-to-end correctness of the NEXMark queries: the Jet engine's output
  * must equal the Spark DataFrame computation over the same deterministic
  * event set, and the Spark computation must equal DuckDB (via the Oracle).
  * Jet ≡ Spark ≡ DuckDB.
  */
class NexmarkQuerySpec extends SparkSpec {

  private val cfg = NexmarkConfig(numPersons = 60, numAuctions = 40, eventsPerSecond = 5000)
  private val gen = new Generator(cfg)
  private val N   = 20000L
  private def sp  = Queries.StreamParams(gen, N, None, wmStrideMs = 5, sourceLp = 1)
  private val wd  = WindowDef(500, 100)

  private lazy val allBids     = gen.bids(N)
  private lazy val allPersons  = gen.persons(N)
  private lazy val allAuctions = gen.auctions(N)

  private def runJet(nodes: Int = 2, threads: Int = 2)(build: (Pipeline, SinkDef) => Unit): Vector[Any] =
    TestSupport.runCollect(nodes, threads)(build)

  private def multiset[T](xs: Seq[T]): Map[T, Int] =
    xs.groupBy(identity).map { case (k, v) => k -> v.size }

  // ------------------------------------------------------------------ Q1
  test("Q1: Jet equals Spark equals DuckDB") {
    val jet = runJet()((p, sink) => Queries.q1(p, sp, sink))
      .map(_.asInstanceOf[Q1Out])
      .map(o => (o.auction, o.bidder, o.price, o.ts))
    val sparkDf  = SparkQueries.q1(spark, allBids)
    val sparkRes = sparkDf.collect().map(r => (r.getLong(0), r.getLong(1), r.getDouble(2), r.getLong(3)))
    assert(multiset(jet) == multiset(sparkRes.toSeq), "Jet vs Spark mismatch on Q1")
    Oracle.assertEquivalent(sparkDf, SparkQueries.q1DuckSql, "bids" -> SparkQueries.bidsDf(spark, allBids))
  }

  test("Q1 output size equals the number of bids") {
    val jet = runJet()((p, sink) => Queries.q1(p, sp, sink))
    assert(jet.size == allBids.size)
  }

  // ------------------------------------------------------------------ Q2
  test("Q2: Jet equals Spark equals DuckDB") {
    val mod = 7L
    val jet = runJet()((p, sink) => Queries.q2(p, sp, sink, mod))
      .map(_.asInstanceOf[Q2Out])
      .map(o => (o.auction, o.price))
    val sparkDf  = SparkQueries.q2(spark, allBids, mod)
    val sparkRes = sparkDf.collect().map(r => (r.getLong(0), r.getDouble(1)))
    assert(multiset(jet) == multiset(sparkRes.toSeq), "Jet vs Spark mismatch on Q2")
    Oracle.assertEquivalent(sparkDf, SparkQueries.q2DuckSql(mod), "bids" -> SparkQueries.bidsDf(spark, allBids))
  }

  // ------------------------------------------------------------------ Q5
  test("Q5: Jet equals Spark equals DuckDB") {
    val jet = runJet()((p, sink) => Queries.q5(p, sp, wd, sink))
      .map(_.asInstanceOf[Q5Out])
      .map(o => (o.windowEnd, o.auction, o.cnt))
    val sparkDf  = SparkQueries.q5(spark, allBids, wd)
    val sparkRes = sparkDf.collect().map(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
    assert(jet.toSet == sparkRes.toSet, "Jet vs Spark mismatch on Q5")
    assert(jet.size == jet.distinct.size, "duplicate Q5 results")
    Oracle.assertEquivalent(sparkDf, SparkQueries.q5DuckSql(wd), "bids" -> SparkQueries.bidsDf(spark, allBids))
  }

  test("Q5 on a larger cluster with a different window still matches Spark") {
    val wd2 = WindowDef(300, 50)
    val jet = runJet(nodes = 3, threads = 2)((p, sink) => Queries.q5(p, sp, wd2, sink))
      .map(_.asInstanceOf[Q5Out])
      .map(o => (o.windowEnd, o.auction, o.cnt))
    val sparkRes = SparkQueries.q5(spark, allBids, wd2).collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
    assert(jet.toSet == sparkRes.toSet)
  }

  test("Q5 under exactly-once snapshots produces identical results") {
    val inst = new repro.core.JetInstance(2, 2)
    try {
      val out  = new java.util.concurrent.ConcurrentLinkedQueue[Any]()
      val p    = new Pipeline
      Queries.q5(p, sp, wd, repro.pipeline.ForeachSinkDef((v, _) => { out.add(v); () }, 1))
      inst
        .submit(p.toDag(), JobConfig("q5-eo", Guarantee.ExactlyOnce, snapshotIntervalMs = 100))
        .awaitCompletion(120000)
      import scala.jdk.CollectionConverters._
      val jet = out.asScala.toVector.map(_.asInstanceOf[Q5Out]).map(o => (o.windowEnd, o.auction, o.cnt))
      val sparkRes = SparkQueries.q5(spark, allBids, wd).collect()
        .map(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
      assert(jet.toSet == sparkRes.toSet)
    } finally inst.shutdown()
  }

  // ------------------------------------------------------------------ Q8
  test("Q8: Jet equals Spark equals DuckDB") {
    val jet = runJet()((p, sink) => Queries.q8(p, sp, wd, sink))
      .map(_.asInstanceOf[Q8Out])
      .map(o => (o.person, o.name, o.windowEnd))
    val sparkDf  = SparkQueries.q8(spark, allPersons, allAuctions, wd)
    val sparkRes = sparkDf.collect().map(r => (r.getLong(0), r.getString(1), r.getLong(2)))
    assert(jet.toSet == sparkRes.toSet, "Jet vs Spark mismatch on Q8")
    assert(jet.size == jet.distinct.size, "duplicate Q8 results")
    Oracle.assertEquivalent(
      sparkDf,
      SparkQueries.q8DuckSql(wd),
      "persons"  -> SparkQueries.personsDf(spark, allPersons),
      "auctions" -> SparkQueries.auctionsDf(spark, allAuctions)
    )
  }

  // ----------------------------------------------------------------- Q13
  test("Q13: Jet equals Spark equals DuckDB") {
    val jet = runJet()((p, sink) => Queries.q13(p, sp, sink))
      .map(_.asInstanceOf[Q13Out])
      .map(o => (o.auction, o.price, o.category))
    val sparkDf  = SparkQueries.q13(spark, allBids, cfg.numAuctions)
    val sparkRes = sparkDf.collect().map(r => (r.getLong(0), r.getDouble(1), r.getString(2)))
    assert(multiset(jet) == multiset(sparkRes.toSeq), "Jet vs Spark mismatch on Q13")
    Oracle.assertEquivalent(
      sparkDf,
      SparkQueries.q13DuckSql,
      "bids" -> SparkQueries.bidsDf(spark, allBids),
      "side" -> SparkQueries.sideDf(spark, cfg.numAuctions)
    )
  }

  test("Q13 joins every bid (side table covers all auctions)") {
    val jet = runJet()((p, sink) => Queries.q13(p, sp, sink))
    assert(jet.size == allBids.size)
  }
}
