package repro.jobs

import repro.baselines.ContTuneSession
import repro.core.TuningSession
import repro.dataflow._
import repro.workloads.{Pqp, SourceRates}

/** Scratch diagnostic for ContTune's backpressure-at-end incidents. */
object ContTuneDebug {
  def main(args: Array[String]): Unit = {
    Pqp.twoWayJoins.foreach { w =>
      val s = new ContTuneSession(w, SimMode.Flink)
      var cur = TuningSession.initialConfig(w)
      var bp = 0
      val detail = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
      SourceRates.pattern(w.key).zipWithIndex.foreach { case (m, i) =>
        val r = s.tuneProcess(m.toDouble, cur)
        cur = r.parallelisms
        bp += r.backpressureAtEnd
        if (r.backpressureAtEnd > 0) detail += ((i, m))
      }
      if (bp > 0) {
        println(s"${w.key}: bp=$bp at ${detail.take(8)}")
        // Inspect the first failing process state.
        val (idx, m) = detail.head
        val r = Simulator.run(w.dag, w.rates(m.toDouble, SimMode.Flink), cur, SimMode.Flink)
        println("  final cfg: " + w.dag.topoOrder.map(id => s"$id=${cur(id)}").mkString(" "))
        w.dag.topoOrder.foreach { id =>
          val o = r.ops(id)
          if (o.overloaded)
            println(f"  OVERLOADED $id p=${o.parallelism} offered=${o.offeredRate}%.0f pa=${o.processingAbility}%.0f")
        }
      }
    }
  }
}
