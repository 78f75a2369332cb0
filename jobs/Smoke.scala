package repro.jobs

import repro.core._
import repro.dataflow._
import repro.harness.Evaluation
import repro.workloads._

/** Scratch smoke-run used while calibrating the substrate; kept as a cheap
  * end-to-end sanity entrypoint (not part of any table).
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    def timed[A](tag: String)(f: => A): A = {
      val t0 = System.nanoTime()
      val r  = f
      println(f"[$tag] ${(System.nanoTime() - t0) / 1e9}%.1fs")
      r
    }

    val subset: Vector[Workload] =
      Nexmark.all ++ Vector(Pqp.linear(0), Pqp.linear(3), Pqp.twoWayJoin(1),
        Pqp.twoWayJoin(6), Pqp.threeWayJoin(0), Pqp.threeWayJoin(9))

    // Ground-truth optima at m=10 for reference.
    subset.foreach { w =>
      val rates = w.rates(10, SimMode.Flink)
      val req = {
        val out = scala.collection.mutable.Map.empty[String, Double]
        w.dag.topoOrder.foreach { id =>
          val op = w.dag.byId(id)
          val in = if (w.dag.upstream(id).isEmpty) rates(id)
                   else w.dag.upstream(id).map(out).sum
          out(id) = math.min(in, Simulator.processingAbility(op, 100, SimMode.Flink)) * op.selectivity
        }
        out.toMap
      }
      val opt = w.dag.ops.map { op =>
        if (op.opType == OpType.Source) 1
        else {
          val in = w.dag.upstream(op.id).map(u =>
            req(u)).sum
          Simulator.optimalParallelism(op, in, SimMode.Flink, 100)
        }
      }.sum
      println(s"${w.key}: optimal total parallelism @10Wu ~= $opt")
    }

    val pre = timed("pretrain") {
      Pretrain.pretrain(subset, SimMode.Flink, runsPer = 150, epochs = 40)
    }
    println(s"clusters: ${pre.clusters.map(c => c.id -> c.memberDags.size)}")

    val zt = timed("pretrainZeroTune") {
      Pretrain.pretrainZeroTune(subset.filter(_.group != "Q1"), SimMode.Flink, runsPer = 15, epochs = 60)
    }

    val methods = Seq(
      "DS2" -> Evaluation.ds2Factory(SimMode.Flink),
      "ContTune" -> Evaluation.contTuneFactory(SimMode.Flink),
      "StreamTune" -> Evaluation.streamTuneFactory(pre, Evaluation.svmModel),
      "ZeroTune" -> Evaluation.zeroTuneFactory(zt, SimMode.Flink),
    )
    val stats = timed("evaluate") {
      Evaluation.evaluate(subset, SimMode.Flink, methods)
    }
    println(f"${"method"}%-12s ${"workload"}%-14s ${"avgRe"}%7s ${"bp"}%4s ${"par@10"}%8s")
    stats.sortBy(s => (s.workloadKey, s.method)).foreach { s =>
      println(f"${s.method}%-12s ${s.workloadKey}%-14s ${s.avgReconfigurations}%7.2f ${s.backpressureOccurrences}%4d ${s.parallelismAt10Wu}%8.1f")
    }

    // Timely mode (Fig 8): Q3/Q5/Q8.
    val timelyWl = Vector(Nexmark.q3, Nexmark.q5, Nexmark.q8)
    val preT = timed("pretrain-timely") {
      Pretrain.pretrain(timelyWl, SimMode.Timely, runsPer = 150, epochs = 40)
    }
    val statsT = timed("evaluate-timely") {
      Evaluation.evaluate(timelyWl, SimMode.Timely, Seq(
        "DS2" -> Evaluation.ds2Factory(SimMode.Timely),
        "ContTune" -> Evaluation.contTuneFactory(SimMode.Timely),
        "StreamTune" -> Evaluation.streamTuneFactory(preT, Evaluation.svmModel),
      ))
    }
    println(f"${"method"}%-12s ${"workload"}%-6s ${"avgRe"}%7s ${"bp"}%4s ${"par@10"}%8s ${"latP50"}%8s ${"latP95"}%8s")
    statsT.sortBy(s => (s.workloadKey, s.method)).foreach { s =>
      println(f"${s.method}%-12s ${s.workloadKey}%-6s ${s.avgReconfigurations}%7.2f ${s.backpressureOccurrences}%4d ${s.parallelismAt10Wu}%8.1f ${s.latencyP50At10Wu}%8.3f ${s.latencyP95At10Wu}%8.3f")
    }
  }
}
