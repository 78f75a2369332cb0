package repro.workloads

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Spark DataFrame implementations of the evaluated Nexmark queries (Q1,
  * Q2, Q3, Q5, Q8), over the Nexmark-lite streams of [[repro.SynthData]].
  *
  * These ground the simulator's logical DAGs ([[Nexmark]]) in real,
  * correctness-checked query semantics: every query here has a matching
  * DuckDB SQL (`*Sql`) executed by `repro.Oracle` over identical inputs in
  * the test suite. Windows use the discrete `*_epoch` column (tumbling
  * window = epoch / length), keeping both engines deterministic.
  */
object NexmarkQueries {

  /** Q1 (map): currency conversion, dollars -> euros. */
  def q1(bids: DataFrame): DataFrame =
    bids.select(
      col("b_auction"),
      col("b_bidder"),
      round(col("b_price") * 0.908, 2) as "price_eur",
      col("b_epoch"),
    )

  val q1Sql: String =
    """SELECT CAST(b_auction AS BIGINT) AS b_auction,
      |       CAST(b_bidder AS BIGINT)  AS b_bidder,
      |       ROUND(CAST(b_price AS DOUBLE) * 0.908, 2) AS price_eur,
      |       CAST(b_epoch AS INT) AS b_epoch
      |FROM bids""".stripMargin

  /** Q2 (filter): bids on a fixed set of auctions (id % 123 == 0). */
  def q2(bids: DataFrame): DataFrame =
    bids.filter(col("b_auction") % 123 === 0)
      .select(col("b_auction"), col("b_price"))

  val q2Sql: String =
    """SELECT CAST(b_auction AS BIGINT) AS b_auction,
      |       CAST(b_price AS DOUBLE)   AS b_price
      |FROM bids
      |WHERE CAST(b_auction AS BIGINT) % 123 = 0""".stripMargin

  /** Q3 (incremental join): sellers in OR/ID/CA with category-10 auctions. */
  def q3(persons: DataFrame, auctions: DataFrame): DataFrame =
    persons
      .filter(col("p_state").isin("OR", "ID", "CA"))
      .join(auctions.filter(col("a_category") === 10),
        col("p_id") === col("a_seller"))
      .select(col("p_name"), col("p_state"), col("a_id"), col("a_reserve"))

  val q3Sql: String =
    """SELECT p_name,
      |       p_state,
      |       CAST(a_id AS BIGINT)       AS a_id,
      |       CAST(a_reserve AS DOUBLE)  AS a_reserve
      |FROM persons JOIN auctions ON CAST(p_id AS BIGINT) = CAST(a_seller AS BIGINT)
      |WHERE p_state IN ('OR','ID','CA') AND CAST(a_category AS INT) = 10""".stripMargin

  /** Q5 (hot items, windowed): auctions with the most bids per window. */
  def q5(bids: DataFrame, windowLen: Int = 10): DataFrame = {
    val counts = bids
      .withColumn("w", (col("b_epoch") / windowLen).cast("int"))
      .groupBy(col("w"), col("b_auction"))
      .agg(count(lit(1)) as "bid_count")
    val maxPerW = counts.groupBy(col("w") as "w2").agg(max("bid_count") as "max_count")
    counts
      .join(maxPerW, counts("w") === maxPerW("w2") && counts("bid_count") === maxPerW("max_count"))
      .select(col("w"), col("b_auction"), col("bid_count"))
  }

  def q5Sql(windowLen: Int = 10): String =
    s"""WITH counts AS (
       |  SELECT CAST(FLOOR(CAST(b_epoch AS INT) / $windowLen) AS INT) AS w,
       |         CAST(b_auction AS BIGINT) AS b_auction,
       |         COUNT(*) AS bid_count
       |  FROM bids GROUP BY 1, 2
       |), mx AS (
       |  SELECT w AS w2, MAX(bid_count) AS max_count FROM counts GROUP BY 1
       |)
       |SELECT counts.w, counts.b_auction, counts.bid_count
       |FROM counts JOIN mx ON counts.w = mx.w2 AND counts.bid_count = mx.max_count""".stripMargin

  /** Q8 (monitor new users): persons and their auctions in the same
    * tumbling window.
    */
  def q8(persons: DataFrame, auctions: DataFrame, windowLen: Int = 10): DataFrame = {
    val p = persons.withColumn("pw", (col("p_epoch") / windowLen).cast("int"))
    val a = auctions.withColumn("aw", (col("a_epoch") / windowLen).cast("int"))
    p.join(a, col("p_id") === col("a_seller") && col("pw") === col("aw"))
      .select(col("p_id"), col("p_name"), col("a_id"), col("pw") as "w")
  }

  def q8Sql(windowLen: Int = 10): String =
    s"""SELECT CAST(p_id AS BIGINT) AS p_id,
       |       p_name,
       |       CAST(a_id AS BIGINT) AS a_id,
       |       CAST(FLOOR(CAST(p_epoch AS INT) / $windowLen) AS INT) AS w
       |FROM persons JOIN auctions ON CAST(p_id AS BIGINT) = CAST(a_seller AS BIGINT)
       | AND CAST(FLOOR(CAST(p_epoch AS INT) / $windowLen) AS INT) =
       |     CAST(FLOOR(CAST(a_epoch AS INT) / $windowLen) AS INT)""".stripMargin

  /** Convenience: run a query by key over freshly generated inputs. */
  def run(spark: SparkSession, key: String, sf: Double = 0.005): DataFrame = key match {
    case "Q1" => q1(repro.SynthData.bids(spark, sf))
    case "Q2" => q2(repro.SynthData.bids(spark, sf))
    case "Q3" => q3(repro.SynthData.persons(spark, sf), repro.SynthData.auctions(spark, sf))
    case "Q5" => q5(repro.SynthData.bids(spark, sf))
    case "Q8" => q8(repro.SynthData.persons(spark, sf), repro.SynthData.auctions(spark, sf))
    case other => throw new IllegalArgumentException(s"unknown query $other")
  }
}
