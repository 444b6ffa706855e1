package repro.pipeline

import repro.{Oracle, SparkSpec, SynthData, TestSupport}
import repro.core._

/** Pipeline API tests on the batch side: word count (Listing 1), TPC-H-lite
  * grouped aggregates and the hybrid batch+stream hash join of Listing 2 —
  * all oracle-checked against Spark DataFrames + DuckDB.
  */
class PipelineSpec extends SparkSpec {

  test("word count (Listing 1) matches the expected counts") {
    val lines = Vector(
      "the quick brown fox",
      "the lazy dog",
      "the quick dog jumps"
    )
    val out = TestSupport.runCollect(2, 2) { (p, sink) =>
      p.readFrom[String](BatchSourceDef(lines))
        .flatMap(_.toLowerCase.split("\\W+").toSeq)
        .filter(_.nonEmpty)
        .groupingKey(identity)
        .aggregate(AggregateOperations.counting)
        .writeTo(sink)
    }
    val expected = lines.flatMap(_.toLowerCase.split("\\W+")).filter(_.nonEmpty)
      .groupBy(identity).map { case (w, xs) => (w, xs.size.toLong) }.toSet
    assert(out.map(_.asInstanceOf[(String, Long)]).toSet == expected)
  }

  test("TPC-H-lite: count of orders per status matches Spark and DuckDB") {
    // Project to the columns under test (full-row collect trips Spark 4.1's
    // date decoding in the forked JVM; the dates are irrelevant here).
    val ordersDf = SynthData.orders(spark, sf = 0.003)
      .select("o_orderstatus", "o_orderkey").cache()
    val rows = ordersDf.collect().map(r => (r.getAs[String]("o_orderstatus"), r.getAs[Long]("o_orderkey"))).toVector
    val out = TestSupport.runCollect(2, 2) { (p, sink) =>
      p.readFrom[(String, Long)](BatchSourceDef(rows))
        .groupingKey(_._1)
        .aggregate(AggregateOperations.counting)
        .writeTo(sink)
    }
    val jet = out.map(_.asInstanceOf[(String, Long)]).toSet

    import org.apache.spark.sql.functions._
    val sparkDf = ordersDf.groupBy("o_orderstatus").agg(count(lit(1)) as "cnt")
    val sparkRes = sparkDf.collect().map(r => (r.getString(0), r.getLong(1))).toSet
    assert(jet == sparkRes, "Jet and Spark disagree")

    Oracle.assertEquivalent(
      sparkDf,
      "SELECT o_orderstatus, COUNT(*) AS cnt FROM orders GROUP BY o_orderstatus",
      "orders" -> ordersDf
    )
  }

  test("TPC-H-lite: sum of l_quantity per returnflag matches Spark and DuckDB") {
    val liDf = SynthData.lineitem(spark, sf = 0.001)
      .select("l_returnflag", "l_quantity").cache()
    val rows = liDf
      .selectExpr("l_returnflag", "cast(l_quantity as double) as q")
      .collect()
      .map(r => (r.getString(0), r.getDouble(1)))
      .toVector
    val out = TestSupport.runCollect(2, 2) { (p, sink) =>
      p.readFrom[(String, Double)](BatchSourceDef(rows))
        .groupingKey(_._1)
        .aggregate(AggregateOperations.summingLong(v => math.round(v.asInstanceOf[(String, Double)]._2)))
        .writeTo(sink)
    }
    val jet = out.map(_.asInstanceOf[(String, Long)]).toMap
    val expected = rows.groupBy(_._1).map { case (k, xs) => k -> xs.map(x => math.round(x._2)).sum }
    assert(jet == expected)

    import org.apache.spark.sql.functions._
    val sparkDf = liDf.groupBy("l_returnflag")
      .agg(sum(round(col("l_quantity"), 0)).cast("double") as "sq")
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT l_returnflag, CAST(SUM(ROUND(CAST(l_quantity AS DOUBLE), 0)) AS DOUBLE) AS sq " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> liDf
    )
  }

  test("hybrid batch+stream hash join (Listing 2): counts by age probe") {
    // Build side: customers per market segment; probe: order stream.
    val custDf = SynthData.customer(spark, sf = 0.01).cache()
    val custRows = custDf.collect()
      .map(r => (r.getAs[Long]("c_custkey"), r.getAs[String]("c_mktsegment"))).toVector
    val n = 3000L
    val out = TestSupport.runCollect(2, 2) { (p, sink) =>
      val build = p.readFrom[(Long, String)](BatchSourceDef(custRows))
      p.readFrom[Long](StreamSourceDef(seq => seq % 1500 + 1, _ => 0L, n, None, 100, 1))
        .hashJoin[(Long, String), Long, (Long, String)](
          build,
          identity,
          _._1,
          (k, ms) => ms.iterator.map(m => (k, m._2))
        )
        .writeTo(sink)
    }
    val segs = custRows.toMap
    assert(out.size == n)
    assert(out.forall { v =>
      val (k, s) = v.asInstanceOf[(Long, String)]
      segs(k) == s
    })
  }

  test("batch stage of Listing 2 with aggregation feeding the join") {
    // countByAge-style: count customers per nation, then join a stream of
    // nation keys against those counts.
    val custDf = SynthData.customer(spark, sf = 0.005).cache()
    val custRows = custDf.collect().map(r => r.getAs[Int]("c_nationkey")).toVector
    val expected = custRows.groupBy(identity).map { case (k, xs) => (k, xs.size.toLong) }
    val out = TestSupport.runCollect(1, 2) { (p, sink) =>
      val counts = p.readFrom[Int](BatchSourceDef(custRows))
        .groupingKey(identity)
        .aggregate(AggregateOperations.counting)
      p.readFrom[Int](StreamSourceDef(seq => (seq % 25).toInt, _ => 0L, 500, None, 100, 1))
        .hashJoin[(Int, Long), Int, (Int, Long)](
          counts,
          identity,
          _._1,
          (k, ms) => ms.iterator.map(m => (k, m._2))
        )
        .writeTo(sink)
    }
    assert(out.size == out.count { v =>
      val (k, c) = v.asInstanceOf[(Int, Long)]
      expected.get(k).contains(c)
    })
  }

  test("pipeline with no sink is rejected") {
    val p = new Pipeline
    p.readFrom[Long](BatchSourceDef(Vector(1L)))
    intercept[IllegalArgumentException](p.toDag())
  }

  test("zipf key generator is skewed, uniform is not") {
    val z = SynthData.zipfKeys(spark, 20000, 100, alpha = 1.2).groupBy("k").count()
      .collect().map(r => r.getAs[Long]("count")).sorted.reverse
    val u = SynthData.uniformKeys(spark, 20000, 100).groupBy("k").count()
      .collect().map(r => r.getAs[Long]("count")).sorted.reverse
    assert(z.head > u.head * 2, s"zipf head ${z.head} not skewed vs uniform ${u.head}")
  }
}
