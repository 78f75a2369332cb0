package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.{Evaluation, PaperTables, WorkloadStats}

/** Shared bootstrap for the spark-submit entrypoints: a local SparkSession
  * (used to render result tables as DataFrames, and proof the harness runs
  * under spark-submit) plus the common evaluation pipeline.
  */
object PaperJobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  def showStats(spark: SparkSession, stats: Seq[WorkloadStats]): Unit = {
    import spark.implicits._
    stats.toDF().createOrReplaceTempView("stats")
    spark.sql(
      """SELECT method, `group`, round(avg(avgReconfigurations), 2) AS avg_reconfigs,
        |       sum(backpressureOccurrences) AS bp,
        |       round(avg(parallelismAt10Wu), 1) AS par_at_10wu
        |FROM stats GROUP BY method, `group` ORDER BY `group`, method""".stripMargin
    ).show(100, truncate = false)
  }

  def flink(): (SparkSession, Vector[WorkloadStats]) = {
    val spark = session("streamtune-repro")
    val pre   = PaperTables.pretrainFlink()
    val zt    = PaperTables.pretrainZeroTune()
    (spark, PaperTables.flinkEvaluation(pre, zt))
  }
}

/** Table II: source-rate units per streaming job (spec table). */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val code = PaperTables.tableIIFromCode
    require(code == PaperTables.tableII, "Table II drifted from the paper")
    println(f"${"group"}%-12s${"stream"}%-12s${"Flink Wu"}%12s${"Timely Wu"}%12s")
    PaperTables.tableII.foreach { case (g, s, f, t) =>
      println(f"$g%-12s$s%-12s${f.map(_.toLong.toString).getOrElse("/")}%12s${t.map(_.toLong.toString).getOrElse("/")}%12s")
    }
  }
}

/** Table III: backpressure occurrences during tuning (paper vs measured). */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val (spark, stats) = PaperJobs.flink()
    println(PaperTables.formatGroupTable("Table III: backpressure occurrences",
      stats, _.backpressureOccurrences.toDouble, PaperTables.paperTableIII))
    PaperJobs.showStats(spark, stats)
    spark.stop()
  }
}

/** Fig. 6 numbers: final total parallelism at 10*Wu in Flink mode. */
object ParallelismJob {
  def main(args: Array[String]): Unit = {
    val (spark, stats) = PaperJobs.flink()
    println(PaperTables.formatGroupTable("Fig 6: total parallelism @ 10Wu (Flink)",
      stats, _.parallelismAt10Wu))
    PaperJobs.showStats(spark, stats)
    spark.stop()
  }
}

/** Fig. 7a numbers: average reconfigurations per tuning process. */
object ReconfigJob {
  def main(args: Array[String]): Unit = {
    val (spark, stats) = PaperJobs.flink()
    println(PaperTables.formatGroupTable("Fig 7a: avg reconfigurations per process",
      stats, _.avgReconfigurations))
    PaperJobs.showStats(spark, stats)
    spark.stop()
  }
}

/** Fig. 8 numbers: Timely-mode parallelism + per-epoch latency percentiles. */
object TimelyJob {
  def main(args: Array[String]): Unit = {
    val spark = PaperJobs.session("streamtune-repro-timely")
    val stats = PaperTables.timelyEvaluation()
    println(PaperTables.formatGroupTable("Fig 8a: total parallelism @ 10Wu (Timely)",
      stats, _.parallelismAt10Wu))
    stats.sortBy(s => (s.workloadKey, s.method)).foreach { s =>
      println(f"${s.method}%-12s ${s.workloadKey}%-4s latency p50=${s.latencyP50At10Wu}%.3fs " +
        f"p95=${s.latencyP95At10Wu}%.3fs p99=${s.latencyP99At10Wu}%.3fs")
    }
    PaperJobs.showStats(spark, stats)
    spark.stop()
  }
}

/** Fig. 11a numbers: fine-tuning model ablation (SVM / XGBoost / NN). */
object AblationJob {
  def main(args: Array[String]): Unit = {
    val spark = PaperJobs.session("streamtune-repro-ablation")
    val pre   = PaperTables.pretrainFlink()
    val stats = PaperTables.ablation(pre)
    println(PaperTables.formatGroupTable("Fig 11a: backpressure by fine-tune model",
      stats, _.backpressureOccurrences.toDouble))
    println(PaperTables.formatGroupTable("Fig 11a: parallelism by fine-tune model",
      stats, _.parallelismAt10Wu))
    PaperJobs.showStats(spark, stats)
    spark.stop()
  }
}

/** Fig. 11b numbers: similarity-center time, direct GED vs AStar+-LSa. */
object GedTimingJob {
  def main(args: Array[String]): Unit = {
    println(f"${"#DAGs"}%8s${"direct (ms)"}%14s${"A*-LSa (ms)"}%14s${"reduction"}%10s")
    PaperTables.gedTiming().foreach { case (n, direct, lsa) =>
      println(f"$n%8d$direct%14.1f$lsa%14.1f${100 * (1 - lsa / direct)}%9.1f%%")
    }
  }
}
