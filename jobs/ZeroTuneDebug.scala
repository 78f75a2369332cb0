package repro.jobs

import repro.baselines.ZeroTuneSession
import repro.core._
import repro.dataflow._
import repro.workloads.{Pqp, SourceRates}

/** Scratch diagnostic for ZeroTune's residual backpressure on Linear. */
object ZeroTuneDebug {
  def main(args: Array[String]): Unit = {
    val enc = Pretrain.pretrainZeroTune(Pqp.all, SimMode.Flink, runsPer = 40, epochs = 40)
    Pqp.linears.foreach { w =>
      val s = new ZeroTuneSession(enc, w, SimMode.Flink)
      var cur = TuningSession.initialConfig(w)
      var bp = 0
      val fails = scala.collection.mutable.ArrayBuffer.empty[Int]
      SourceRates.pattern(w.key).foreach { m =>
        val r = s.tuneProcess(m.toDouble, cur)
        cur = r.parallelisms
        bp += r.backpressureAtEnd
        if (r.backpressureAtEnd > 0 && fails.size < 2) {
          fails += m
          println(s"${w.key} m=$m cfg=" + w.dag.topoOrder.map(id => s"$id=${cur(id)}").mkString(" "))
          r.finalRun.metricsInTopoOrder.filter(_.overloaded).foreach { o =>
            println(f"   OVER ${o.id} p=${o.parallelism} offered=${o.offeredRate}%.0f pa=${o.processingAbility}%.0f")
          }
        }
      }
      if (bp > 0) println(s"${w.key}: bp=$bp")
    }
  }
}
