package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Properties}
import repro.dataflow.DetRandom

object MonotonicFixtures {
  val dim = 6

  def h(seed: Int): Array[Double] =
    Array.tabulate(dim)(j => DetRandom.unit("h", seed, j))

  /** Rows for a clean threshold t(h) = 5 + 40 * h(0). */
  def rows(n: Int, seed: Int = 1): IndexedSeq[TrainRow] =
    (0 until n).map { i =>
      val hv = h(seed * 10000 + i % 25) // 25 distinct embeddings
      val p = 1 + (DetRandom.unit("p", seed, i) * 99).toInt
      val thr = 5 + 40 * hv(0)
      TrainRow(hv, p, if (p < thr) 1 else 0)
    }
}

class MonotonicSpec extends AnyFunSuite {
  import MonotonicFixtures._

  private def fitted(model: FineTuneModel): FineTuneModel = {
    model.fit(rows(4000))
    model
  }

  test("SVM recovers thresholds within a small margin") {
    val m = fitted(new MonotonicSvm(dim))
    // Query the trained anchor embeddings (seed 1 -> h(10000 + i)).
    (0 until 20).foreach { s =>
      val hv = h(10000 + s)
      val trueThr = 5 + 40 * hv(0)
      val got = FineTuneModel.minSafeParallelism(m, hv, 100)
      assert(math.abs(got - trueThr) <= math.max(3.0, trueThr * 0.35),
        s"svm=$got true=$trueThr")
    }
  }

  test("XGBoost recovers thresholds within a small margin") {
    val m = fitted(new MonotonicGbt(dim))
    (0 until 10).foreach { s =>
      val hv = h(10000 + s)
      val trueThr = 5 + 40 * hv(0)
      val got = FineTuneModel.minSafeParallelism(m, hv, 100)
      assert(math.abs(got - trueThr) <= math.max(5.0, trueThr * 0.5),
        s"gbt=$got true=$trueThr")
    }
  }

  test("SVM probability is non-increasing in parallelism everywhere") {
    val m = fitted(new MonotonicSvm(dim))
    (0 until 30).foreach { s =>
      val hv = h(s)
      (1 until 100).foreach { p =>
        assert(m.bottleneckProb(hv, p + 1) <= m.bottleneckProb(hv, p) + 1e-12)
      }
    }
  }

  test("XGBoost probability is non-increasing in parallelism everywhere") {
    val m = fitted(new MonotonicGbt(dim))
    (0 until 30).foreach { s =>
      val hv = h(s)
      (1 until 100).foreach { p =>
        assert(m.bottleneckProb(hv, p + 1) <= m.bottleneckProb(hv, p) + 1e-9,
          s"violation at seed=$s p=$p")
      }
    }
  }

  test("unconstrained GBT on conflicting data CAN violate monotonicity") {
    // Adversarial labels: bottleneck at high p only — impossible under the
    // constraint, representable without it.
    val bad = (0 until 400).map { i =>
      val hv = h(3)
      val p = 1 + (DetRandom.unit("bp", i) * 99).toInt
      TrainRow(hv, p, if (p > 50) 1 else 0)
    }
    val free = new MonotonicGbt(dim, enforceMonotone = false)
    free.fit(bad)
    val hv = h(3)
    val violates = (1 until 100).exists(p => free.bottleneckProb(hv, p + 1) > free.bottleneckProb(hv, p) + 1e-9)
    assert(violates, "unconstrained trees should follow the inverted labels")
    // The constrained version refuses to invert.
    val mono = new MonotonicGbt(dim)
    mono.fit(bad)
    (1 until 100).foreach { p =>
      assert(mono.bottleneckProb(hv, p + 1) <= mono.bottleneckProb(hv, p) + 1e-9)
    }
  }

  test("binary search returns the first safe parallelism under monotonicity") {
    val m = fitted(new MonotonicSvm(dim))
    (0 until 15).foreach { s =>
      val hv = h(s)
      val got = FineTuneModel.minSafeParallelism(m, hv, 100)
      // Exhaustive scan agrees with the binary search.
      val scan = (1 to 100).find(p => m.bottleneckProb(hv, p) < FineTuneModel.safeProb).getOrElse(100)
      assert(got == scan)
    }
  }

  test("minSafeParallelism returns pMax when nothing is safe") {
    val m = new MonotonicSvm(dim)
    m.fit((0 until 100).map(i => TrainRow(h(1), 1 + i % 100, 1))) // all bottleneck
    assert(FineTuneModel.minSafeParallelism(m, h(1), 100) == 100)
  }

  test("empty fit predicts safe everywhere (threshold below 1)") {
    val m = new MonotonicSvm(dim)
    m.fit(IndexedSeq.empty)
    assert(FineTuneModel.minSafeParallelism(m, h(2), 100) == 1)
  }

  test("SVM threshold cache is invalidated by refits") {
    val m = new MonotonicSvm(dim)
    val hv = h(4)
    m.fit((0 until 50).map(i => TrainRow(hv, 1 + i % 100, 0)))
    val before = m.threshold(hv)
    m.fit((0 until 50).map(i => TrainRow(hv, 1 + i % 100, 1)))
    assert(m.threshold(hv) != before)
  }

  test("NN fits the same synthetic task to reasonable accuracy") {
    val m = new PlainNn(dim)
    m.fit(rows(1500))
    var correct = 0
    val test = rows(300, seed = 2)
    test.foreach { r =>
      val pred = if (m.bottleneckProb(r.h, r.p) > 0.5) 1 else 0
      if (pred == r.label) correct += 1
    }
    assert(correct.toDouble / test.size > 0.7, s"NN accuracy ${correct.toDouble / test.size}")
  }

  test("NN exposes monotonic = false, monotone models expose true") {
    assert(!new PlainNn(dim).monotonic)
    assert(new MonotonicSvm(dim).monotonic)
    assert(new MonotonicGbt(dim).monotonic)
  }
}

/** ScalaCheck property suite: monotonicity of M_f under arbitrary inputs. */
object MonotonicProps extends Properties("MonotonicModels") {
  import MonotonicFixtures._

  private val svm = new MonotonicSvm(dim)
  svm.fit(rows(800))
  private val gbt = new MonotonicGbt(dim, rounds = 10)
  gbt.fit(rows(800))

  private val genH = Gen.choose(0, 10000).map(h)
  private val genP = Gen.choose(1, 99)

  property("svm non-increasing in p") = Prop.forAll(genH, genP) { (hv, p) =>
    svm.bottleneckProb(hv, p + 1) <= svm.bottleneckProb(hv, p) + 1e-12
  }

  property("gbt non-increasing in p") = Prop.forAll(genH, genP) { (hv, p) =>
    gbt.bottleneckProb(hv, p + 1) <= gbt.bottleneckProb(hv, p) + 1e-9
  }

  property("probabilities are valid") = Prop.forAll(genH, genP) { (hv, p) =>
    val a = svm.bottleneckProb(hv, p)
    val b = gbt.bottleneckProb(hv, p)
    a >= 0.0 && a <= 1.0 && b >= 0.0 && b <= 1.0
  }
}
