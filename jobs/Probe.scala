package repro.jobs

import repro.core._
import repro.dataflow._
import repro.workloads._

/** Diagnostic probe: per-operator true minimal parallelism vs the GNN
  * head's implied threshold vs the fine-tuned SVM's minSafe recommendation.
  */
object Probe {
  def main(args: Array[String]): Unit = {
    val subset: Vector[Workload] =
      Nexmark.all ++ Vector(Pqp.linear(0), Pqp.linear(3), Pqp.twoWayJoin(1),
        Pqp.twoWayJoin(6), Pqp.threeWayJoin(0), Pqp.threeWayJoin(9))

    val pre = Pretrain.pretrain(subset, SimMode.Flink, runsPer = 150, epochs = 40)

    // Training accuracy of each cluster encoder on its own history.
    pre.clusters.foreach { c =>
      val samples = c.history.map(Pretrain.toSample).filter(_.labels.exists(_ >= 0))
      var correct = 0; var total = 0; var pos = 0
      samples.foreach { s =>
        val probs = c.encoder.predictProbs(s)
        s.labels.zipWithIndex.foreach { case (y, i) =>
          if (y >= 0) {
            total += 1
            if (y == 1) pos += 1
            if ((probs(i) > 0.5) == (y == 1)) correct += 1
          }
        }
      }
      println(f"cluster ${c.id}: members=${c.memberDags.size} labeled=$total pos=$pos acc=${correct.toDouble / math.max(1, total)}%.3f")
    }

    def trueReq(w: Workload, m: Double): Map[String, Double] = {
      val rates = w.rates(m, SimMode.Flink)
      val out = scala.collection.mutable.Map.empty[String, Double]
      val req = scala.collection.mutable.Map.empty[String, Double]
      w.dag.topoOrder.foreach { id =>
        val op = w.dag.byId(id)
        val in = if (w.dag.upstream(id).isEmpty) rates(id) else w.dag.upstream(id).map(out).sum
        req(id) = in
        out(id) = math.min(in, Simulator.processingAbility(op, 100, SimMode.Flink)) * op.selectivity
      }
      req.toMap
    }

    for (w <- Vector(Workloads.byKey("Q3"), Workloads.byKey("Q5"), Pqp.linear(0), Pqp.threeWayJoin(0));
         m <- Vector(3.0, 10.0)) {
      val cluster = pre.assign(w.dag)
      val rates = w.rates(m, SimMode.Flink)
      val sample = Pretrain.agnosticSample(w.dag, rates)
      val emb = cluster.encoder.embed(sample)
      val svm = new MonotonicSvm(cluster.encoder.hidden)
      svm.fit(cluster.warmUpRows())
      val req = trueReq(w, m)
      println(s"--- ${w.key} @ m=$m (cluster ${cluster.id}) ---")
      w.dag.ops.zipWithIndex.foreach { case (op, i) =>
        if (op.opType != OpType.Source) {
          val pStar = Simulator.optimalParallelism(op, req(op.id), SimMode.Flink, 100)
          // GNN head's own implied threshold.
          val gnnThr = (1 to 100).find { p =>
            val pn = sample.pNorm.clone(); pn(i) = Features.pNorm(p)
            cluster.encoder.predictProbs(sample.withParallelism(pn))(i) < 0.5
          }.getOrElse(101)
          val svmThr = FineTuneModel.minSafeParallelism(svm, emb(i), 100)
          println(f"  ${op.id}%-12s p*=$pStar%3d gnn=$gnnThr%3d svm=$svmThr%3d")
        }
      }
    }
  }
}
