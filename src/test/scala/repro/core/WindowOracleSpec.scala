package repro.core

import repro.{Oracle, SparkSpec, SynthData, TestSupport}
import repro.pipeline._

/** Windowed aggregation over TPC-H-lite and synthetic key streams, verified
  * against Spark + DuckDB: the oracle chain applied to the engine's
  * windowing machinery itself (not just the NEXMark queries).
  */
class WindowOracleSpec extends SparkSpec {

  test("windowed count of lineitems per returnflag over ship-date time matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
      .selectExpr("l_returnflag", "cast(datediff(l_shipdate, date'1992-01-01') as long) as day")
      .cache()
    // Stream in ship-date order so the source's zero-lag watermarks are
    // valid (out-of-order handling is tested separately below).
    val rows = li.collect().map(r => (r.getString(0), r.getLong(1))).toVector.sortBy(_._2)
    val wd   = WindowDef(300, 100) // "days" as the event-time unit

    val out = TestSupport.runCollect(2, 2) { (p, sink) =>
      p.readFrom[(String, Long)](
          StreamSourceDef(
            seq => rows(seq.toInt),
            seq => rows(seq.toInt)._2,
            rows.size,
            None,
            wmStrideMs = 50,
            localParallelism = 1,
            maxSkewMs = 0 // timestamps here are not monotone in seq: disable skew guard
          ))
        .groupingKey(_._1)
        .window(wd)
        .aggregate(AggregateOperations.counting)
        .writeTo(sink)
    }
    val jet = out.map { v =>
      val r = v.asInstanceOf[KeyedWindowResult[String, Long]]
      (r.key, r.windowEnd, r.result)
    }.toSet

    import org.apache.spark.sql.functions._
    val sparkDf = li
      .withColumn("we", explode(expr(
        s"sequence(day div ${wd.slideMs} * ${wd.slideMs} + ${wd.slideMs}, " +
          s"day div ${wd.slideMs} * ${wd.slideMs} + ${wd.sizeMs}, ${wd.slideMs})")))
      .groupBy(col("we"), col("l_returnflag"))
      .agg(count(lit(1)) as "cnt")
    val sparkRes = sparkDf.collect().map(r => (r.getString(1), r.getLong(0), r.getLong(2))).toSet
    assert(jet == sparkRes, "Jet vs Spark mismatch on windowed lineitem counts")

    Oracle.assertEquivalent(
      sparkDf.select(col("we"), col("l_returnflag"), col("cnt")),
      s"""WITH w AS (SELECT l_returnflag, (CAST(day AS BIGINT) // ${wd.slideMs}) * ${wd.slideMs} + ${wd.slideMs} + g.g AS we
         |           FROM lineitem CROSS JOIN generate_series(0, ${wd.sizeMs - wd.slideMs}, ${wd.slideMs}) AS g(g))
         |SELECT we, l_returnflag, COUNT(*) AS cnt FROM w GROUP BY we, l_returnflag""".stripMargin,
      "lineitem" -> li
    )
  }

  test("tumbling-window sums over a zipf key stream match a naive computation") {
    val zdf = SynthData.zipfKeys(spark, rows = 20000, nKeys = 50)
      .selectExpr("k", "cast(v * 1000 as long) as v").cache()
    val rows = zdf.collect().map(r => (r.getLong(0), r.getLong(1))).toVector
    val wd   = WindowDef(100, 100) // tumbling

    val out = TestSupport.runCollect(1, 3) { (p, sink) =>
      p.readFrom[(Long, Long)](
          StreamSourceDef(seq => rows(seq.toInt), seq => seq / 40, rows.size, None, 20, 1))
        .groupingKey(_._1)
        .window(wd)
        .aggregate(AggregateOperations.summingLong(v => v.asInstanceOf[(Long, Long)]._2))
        .writeTo(sink)
    }
    val jet = out.map { v =>
      val r = v.asInstanceOf[KeyedWindowResult[Long, Long]]
      (r.key, r.windowEnd, r.result)
    }.toSet
    val expected = rows.zipWithIndex
      .map { case ((k, v), i) => (k, Windowing.frameEnd(i / 40L, wd.slideMs), v) }
      .groupBy { case (k, we, _) => (k, we) }
      .map { case ((k, we), xs) => (k, we, xs.map(_._3).sum) }
      .toSet
    assert(jet == expected)
  }

  test("at-least-once without failures is still exact (no spurious duplicates)") {
    val out = new java.util.concurrent.ConcurrentLinkedQueue[Any]()
    val inst = new JetInstance(2, 2)
    try {
      val p = new Pipeline
      p.readFrom[Long](StreamSourceDef(seq => seq, seq => seq / 20, 30000, None, 10, 1))
        .groupingKey(_ % 7)
        .window(WindowDef(100, 50))
        .aggregate(AggregateOperations.counting)
        .writeTo(ForeachSinkDef((v, _) => { out.add(v); () }, 1))
      inst
        .submit(p.toDag(), JobConfig("alo-clean", Guarantee.AtLeastOnce, snapshotIntervalMs = 100))
        .awaitCompletion(120000)
      import scala.jdk.CollectionConverters._
      val results = out.asScala.toVector
        .map(_.asInstanceOf[KeyedWindowResult[Long, Long]])
        .map(r => (r.key, r.windowEnd, r.result))
      assert(results.size == results.distinct.size, "duplicates without any failure")
      val expected = (for {
        seq <- 0L until 30000L
        we  <- Windowing.windowEnds(seq / 20, WindowDef(100, 50))
      } yield (seq % 7, we)).groupBy(identity).map { case ((k, we), xs) => (k, we, xs.size.toLong) }.toSet
      assert(results.toSet == expected)
    } finally inst.shutdown()
  }

  test("out-of-order events within the watermark stride aggregate correctly") {
    // Timestamps descend inside every block of 10 ms but watermarks only
    // advance at 100 ms strides, so the disorder is within the engine's
    // tolerance (§1: out-of-order streams).
    def tsOf(seq: Long): Long = (seq / 10) * 10 + (9 - seq % 10)
    val n  = 20000L
    val wd = WindowDef(100, 50)
    val out = TestSupport.runCollect(2, 2) { (p, sink) =>
      p.readFrom[Long](StreamSourceDef(seq => seq, tsOf, n, None, wmStrideMs = 100, 1))
        .groupingKey(_ % 5)
        .window(wd)
        .aggregate(AggregateOperations.counting)
        .writeTo(sink)
    }
    val jet = out.map { v =>
      val r = v.asInstanceOf[KeyedWindowResult[Long, Long]]
      (r.key, r.windowEnd, r.result)
    }.toSet
    val expected = (for {
      seq <- 0L until n
      we  <- Windowing.windowEnds(tsOf(seq), wd)
    } yield (seq % 5, we)).groupBy(identity).map { case ((k, we), xs) => (k, we, xs.size.toLong) }.toSet
    assert(jet == expected)
  }

  test("uniform keys produce all distinct keys in window results") {
    val out = TestSupport.runCollect(1, 2) { (p, sink) =>
      p.readFrom[Long](StreamSourceDef(seq => seq % 10, seq => seq, 5000, None, 50, 1))
        .groupingKey(identity)
        .window(WindowDef(1000, 500))
        .aggregate(AggregateOperations.counting)
        .writeTo(sink)
    }
    val keys = out.map(_.asInstanceOf[KeyedWindowResult[Long, Long]].key).distinct
    assert(keys.sorted == (0L until 10L).toVector)
  }
}
