package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.dataflow.SimMode
import repro.workloads.{Nexmark, Pqp}

/** The Spark-backed execution-history store: DataFrame round-trips, the
  * relational Algorithm-1 implementation cross-checked against the
  * in-memory labeler, and Oracle-verified aggregations over the store.
  */
class HistorySparkSpec extends SparkSpec {

  private lazy val workloads =
    Vector(Nexmark.q2, Nexmark.q3, Nexmark.q8, Pqp.linear(2), Pqp.twoWayJoin(5), Pqp.threeWayJoin(7))
  private lazy val runs =
    Pretrain.generateHistories(workloads, SimMode.Flink, runsPer = 25)
  private lazy val metricsDF = History.toDF(spark, runs).cache()
  private lazy val edges = History.edgesDF(spark, workloads.map(_.dag)).cache()

  test("record conversion preserves counts (one row per operator-run)") {
    val expected = runs.map(_.run.dag.ops.size).sum
    assert(History.records(runs).size == expected)
    assert(metricsDF.count() == expected)
  }

  test("DataFrame schema exposes the history fields") {
    val cols = metricsDF.columns.toSet
    assert(Set("jobName", "runId", "opId", "parallelism", "utilization",
      "overloaded", "backpressured", "jobBackpressure", "label").subsetOf(cols))
  }

  test("edge table matches the DAG definitions") {
    assert(edges.count() == workloads.map(_.dag.edges.size).sum)
  }

  // The central cross-check: the Spark relational Algorithm 1 must agree
  // with the in-memory labeler on every operator of every run.
  test("Spark Algorithm 1 agrees with the in-memory labeler everywhere") {
    val labeled = History.labelWithSpark(metricsDF, edges)
    val got = labeled.select("jobName", "runId", "opId", "sqlLabel").collect()
      .map(r => (r.getString(0), r.getLong(1), r.getString(2)) -> r.getInt(3)).toMap
    var checked = 0
    runs.zipWithIndex.foreach { case (h, runId) =>
      h.labels.foreach { case (opId, l) =>
        assert(got((h.run.dag.name, runId.toLong, opId)) == l,
          s"${h.run.dag.name}/$runId/$opId")
        checked += 1
      }
    }
    assert(checked == History.records(runs).size)
  }

  test("healthy runs are labeled all-zero by the relational path too") {
    val labeled = History.labelWithSpark(metricsDF, edges)
    val bad = labeled.filter(!col("jobBackpressure") && col("sqlLabel") =!= 0).count()
    assert(bad == 0)
  }

  test("labels of 1 imply utilization above the threshold") {
    val labeled = History.labelWithSpark(metricsDF, edges)
    val bad = labeled.filter(col("sqlLabel") === 1 &&
      col("utilization") <= repro.dataflow.SimConstants.cpuThreshold).count()
    assert(bad == 0)
  }

  test("bottleneck share per operator type matches DuckDB (oracle-checked)") {
    val perType = metricsDF
      .filter(col("label") >= 0)
      .groupBy("opType")
      .agg(
        count(lit(1)) as "n",
        sum(when(col("label") === 1, 1L).otherwise(0L)) as "bottlenecks",
      )
    Oracle.assertEquivalent(
      perType,
      """SELECT opType,
        |       COUNT(*) AS n,
        |       SUM(CASE WHEN CAST(label AS INT) = 1 THEN 1 ELSE 0 END) AS bottlenecks
        |FROM history WHERE CAST(label AS INT) >= 0 GROUP BY opType""".stripMargin,
      "history" -> metricsDF,
    )
  }

  test("per-job backpressure frequency matches DuckDB (oracle-checked)") {
    val perJob = metricsDF
      .select("jobName", "runId", "jobBackpressure").distinct()
      .groupBy("jobName")
      .agg(sum(when(col("jobBackpressure"), 1L).otherwise(0L)) as "bp_runs")
    Oracle.assertEquivalent(
      perJob,
      """SELECT jobName, SUM(CASE WHEN jobBackpressure = 'true' THEN 1 ELSE 0 END) AS bp_runs
        |FROM (SELECT DISTINCT jobName, runId, jobBackpressure FROM history) t
        |GROUP BY jobName""".stripMargin,
      "history" -> metricsDF.select("jobName", "runId", "jobBackpressure"),
    )
  }

  test("mean utilization by parallelism band matches DuckDB (oracle-checked)") {
    val banded = metricsDF.groupBy(((col("parallelism") / 10)).cast("int") as "band")
      .agg(round(avg("utilization"), 4) as "mean_util")
    Oracle.assertEquivalent(
      banded,
      """SELECT CAST(FLOOR(CAST(parallelism AS INT) / 10) AS INT) AS band,
        |       ROUND(AVG(CAST(utilization AS DOUBLE)), 4) AS mean_util
        |FROM history GROUP BY 1""".stripMargin,
      "history" -> metricsDF.select("parallelism", "utilization"),
    )
  }
}
