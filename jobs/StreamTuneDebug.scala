package repro.jobs

import repro.core._
import repro.dataflow._
import repro.workloads.{Pqp, SourceRates, Workloads}

/** Scratch diagnostic for StreamTune process dynamics on one query. */
object StreamTuneDebug {
  def main(args: Array[String]): Unit = {
    val wls = Vector(Pqp.linear(2), Pqp.linear(4), Workloads.byKey("Q1"))
    val pre = Pretrain.pretrain(Workloads.all, SimMode.Flink, runsPer = 150, epochs = 40)
    wls.foreach { w =>
      val s = new StreamTuneSession(pre, w, new MonotonicSvm(pre.clusters.head.encoder.hidden))
      var cur = TuningSession.initialConfig(w)
      var bp = 0
      val parAt10 = scala.collection.mutable.ArrayBuffer.empty[Int]
      SourceRates.pattern(w.key).zipWithIndex.foreach { case (m, i) =>
        val r = s.tuneProcess(m.toDouble, cur)
        cur = r.parallelisms
        bp += r.backpressureAtEnd
        if (m == 10) parAt10 += r.finalRun.totalParallelism
        if (r.backpressureAtEnd > 0) {
          println(s"${w.key} proc=$i m=$m ENDED BP cfg=" +
            w.dag.topoOrder.map(id => s"$id=${cur(id)}").mkString(" "))
          val run = r.finalRun
          w.dag.topoOrder.foreach { id =>
            val o = run.ops(id)
            if (o.overloaded)
              println(f"   OVER $id p=${o.parallelism} offered=${o.offeredRate}%.0f pa=${o.processingAbility}%.0f")
          }
        }
      }
      println(s"${w.key}: bp=$bp parAt10=${parAt10.mkString(",")}")
    }
  }
}
