package repro.nexmark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.WindowDef

/** The NEXMark queries expressed as Spark DataFrame (Catalyst) computations
  * over the *same* deterministic event set the Jet engine consumes — the
  * semantic oracle side of the reproduction. Sliding windows are expanded
  * with `sequence` + `explode`, so a batch query computes exactly the
  * results the streaming engine must emit. Each query also carries the
  * equivalent DuckDB SQL for `repro.Oracle` cross-checking.
  */
object SparkQueries {

  def bidsDf(spark: SparkSession, bids: Seq[Bid]): DataFrame = {
    val s = spark; import s.implicits._
    bids.toDF()
  }
  def personsDf(spark: SparkSession, ps: Seq[Person]): DataFrame = {
    val s = spark; import s.implicits._
    ps.toDF()
  }
  def auctionsDf(spark: SparkSession, as: Seq[Auction]): DataFrame = {
    val s = spark; import s.implicits._
    as.toDF()
  }

  /** Adds column `we`: every window end whose window contains `ts`. */
  private def withWindowEnds(df: DataFrame, wd: WindowDef): DataFrame =
    df.withColumn(
      "we",
      explode(expr(
        s"sequence(ts div ${wd.slideMs} * ${wd.slideMs} + ${wd.slideMs}, " +
          s"ts div ${wd.slideMs} * ${wd.slideMs} + ${wd.sizeMs}, ${wd.slideMs})"
      ))
    )

  // ---------------------------------------------------------------- Q1
  def q1(spark: SparkSession, bids: Seq[Bid]): DataFrame =
    bidsDf(spark, bids).select(
      col("auction"),
      col("bidder"),
      (col("price") * 0.908) as "price",
      col("ts")
    )

  val q1DuckSql: String =
    """SELECT CAST(auction AS BIGINT) AS auction, CAST(bidder AS BIGINT) AS bidder,
      |       CAST(price AS DOUBLE) * 0.908 AS price, CAST(ts AS BIGINT) AS ts
      |FROM bids""".stripMargin

  // ---------------------------------------------------------------- Q2
  def q2(spark: SparkSession, bids: Seq[Bid], mod: Long): DataFrame =
    bidsDf(spark, bids)
      .where(col("auction") % mod === 0)
      .select(col("auction"), col("price"))

  def q2DuckSql(mod: Long): String =
    s"""SELECT CAST(auction AS BIGINT) AS auction, CAST(price AS DOUBLE) AS price
       |FROM bids WHERE CAST(auction AS BIGINT) % $mod = 0""".stripMargin

  // ---------------------------------------------------------------- Q5
  def q5(spark: SparkSession, bids: Seq[Bid], wd: WindowDef): DataFrame = {
    val counts = withWindowEnds(bidsDf(spark, bids), wd)
      .groupBy(col("we"), col("auction"))
      .agg(count(lit(1)) as "cnt")
    val w = Window.partitionBy("we")
    counts
      .withColumn("mx", max("cnt").over(w))
      .where(col("cnt") === col("mx"))
      .select(col("we") as "windowEnd", col("auction"), col("cnt"))
  }

  def q5DuckSql(wd: WindowDef): String =
    s"""WITH b AS (SELECT CAST(auction AS BIGINT) a, CAST(ts AS BIGINT) ts FROM bids),
       |w AS (SELECT a, (ts // ${wd.slideMs}) * ${wd.slideMs} + ${wd.slideMs} + g.g AS we
       |      FROM b CROSS JOIN generate_series(0, ${wd.sizeMs - wd.slideMs}, ${wd.slideMs}) AS g(g)),
       |c AS (SELECT we, a, COUNT(*) AS cnt FROM w GROUP BY we, a),
       |m AS (SELECT we, MAX(cnt) AS mx FROM c GROUP BY we)
       |SELECT c.we AS windowEnd, c.a AS auction, c.cnt AS cnt
       |FROM c JOIN m ON c.we = m.we AND c.cnt = m.mx""".stripMargin

  // ---------------------------------------------------------------- Q8
  def q8(spark: SparkSession, persons: Seq[Person], auctions: Seq[Auction], wd: WindowDef): DataFrame = {
    val pw = withWindowEnds(personsDf(spark, persons), wd).select(col("id"), col("name"), col("we"))
    val aw = withWindowEnds(auctionsDf(spark, auctions), wd).select(col("seller"), col("we") as "awe")
    pw.join(aw, pw("id") === aw("seller") && pw("we") === aw("awe"))
      .select(col("id") as "person", col("name"), col("we") as "windowEnd")
      .distinct()
  }

  def q8DuckSql(wd: WindowDef): String =
    s"""WITH pw AS (SELECT CAST(p.id AS BIGINT) id, p.name,
       |                   (CAST(p.ts AS BIGINT) // ${wd.slideMs}) * ${wd.slideMs} + ${wd.slideMs} + g.g AS we
       |            FROM persons p CROSS JOIN generate_series(0, ${wd.sizeMs - wd.slideMs}, ${wd.slideMs}) AS g(g)),
       |aw AS (SELECT CAST(a.seller AS BIGINT) seller,
       |              (CAST(a.ts AS BIGINT) // ${wd.slideMs}) * ${wd.slideMs} + ${wd.slideMs} + g.g AS we
       |       FROM auctions a CROSS JOIN generate_series(0, ${wd.sizeMs - wd.slideMs}, ${wd.slideMs}) AS g(g))
       |SELECT DISTINCT pw.id AS person, pw.name AS name, pw.we AS windowEnd
       |FROM pw JOIN aw ON pw.id = aw.seller AND pw.we = aw.we""".stripMargin

  // ---------------------------------------------------------------- Q13
  def sideDf(spark: SparkSession, numAuctions: Int): DataFrame = {
    val s = spark; import s.implicits._
    (0L until numAuctions.toLong).map(id => (id, s"cat-${id % 10}")).toDF("sid", "category")
  }

  def q13(spark: SparkSession, bids: Seq[Bid], numAuctions: Int): DataFrame =
    bidsDf(spark, bids)
      .join(sideDf(spark, numAuctions), col("auction") === col("sid"))
      .select(col("auction"), col("price"), col("category"))

  val q13DuckSql: String =
    """SELECT CAST(b.auction AS BIGINT) AS auction, CAST(b.price AS DOUBLE) AS price, s.category
      |FROM bids b JOIN side s ON CAST(b.auction AS BIGINT) = CAST(s.sid AS BIGINT)""".stripMargin
}
