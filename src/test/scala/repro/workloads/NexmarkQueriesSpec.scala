package repro.workloads

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

/** Every evaluated Nexmark query, checked row-for-row against DuckDB over
  * identical inputs — the simulator DAGs for Q1..Q8 stand on these
  * verified semantics.
  */
class NexmarkQueriesSpec extends SparkSpec {

  private val sf = 0.002
  private lazy val bids     = SynthData.bids(spark, sf).cache()
  private lazy val persons  = SynthData.persons(spark, sf).cache()
  private lazy val auctions = SynthData.auctions(spark, sf).cache()

  test("Q1 currency conversion matches DuckDB") {
    Oracle.assertEquivalent(NexmarkQueries.q1(bids), NexmarkQueries.q1Sql, "bids" -> bids)
  }

  test("Q2 auction filter matches DuckDB") {
    Oracle.assertEquivalent(NexmarkQueries.q2(bids), NexmarkQueries.q2Sql, "bids" -> bids)
  }

  test("Q3 person-auction join matches DuckDB") {
    Oracle.assertEquivalent(
      NexmarkQueries.q3(persons, auctions), NexmarkQueries.q3Sql,
      "persons" -> persons, "auctions" -> auctions)
  }

  test("Q5 hot items matches DuckDB") {
    Oracle.assertEquivalent(
      NexmarkQueries.q5(bids), NexmarkQueries.q5Sql(), "bids" -> bids)
  }

  test("Q8 windowed person-auction join matches DuckDB") {
    Oracle.assertEquivalent(
      NexmarkQueries.q8(persons, auctions), NexmarkQueries.q8Sql(),
      "persons" -> persons, "auctions" -> auctions)
  }

  test("Q2 selectivity is far below 1 (it is a filter)") {
    val sel = NexmarkQueries.q2(bids).count().toDouble / bids.count()
    assert(sel < 0.05)
  }

  test("Q5 emits at most a few winners per window") {
    val perWindow = NexmarkQueries.q5(bids).groupBy("w").count().agg(max("count")).collect()(0).getLong(0)
    assert(perWindow >= 1)
    val windows = NexmarkQueries.q5(bids).select("w").distinct().count()
    assert(windows <= SynthData.NexmarkEpochs / 10 + 1)
  }

  test("Q8 windows partition the join (cross-window pairs excluded)") {
    val joined = NexmarkQueries.q8(persons, auctions)
    val violations = joined
      .join(persons, Seq("p_id"))
      .join(auctions.withColumnRenamed("a_id", "aid2"), col("aid2") === col("a_id"))
      .filter((col("p_epoch") / 10).cast("int") =!= (col("a_epoch") / 10).cast("int"))
      .count()
    assert(violations == 0)
  }

  test("run() dispatches every evaluated query") {
    Seq("Q1", "Q2", "Q3", "Q5", "Q8").foreach { k =>
      assert(NexmarkQueries.run(spark, k, sf).columns.nonEmpty)
    }
    assertThrows[IllegalArgumentException](NexmarkQueries.run(spark, "Q4", sf))
  }
}
