package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.dataflow.DetRandom

object GnnFixtures {
  /** 3-node chain sample with controllable rate feature and parallelisms. */
  def chain(rate: Double, ps: Array[Int], labels: Array[Int], cost: Double = 0.0): GraphSample = {
    val f = Features.dim
    val x = Array.tabulate(3) { i =>
      val a = new Array[Double](f)
      a(i) = 1.0
      a(f - 1) = rate
      a
    }
    GraphSample(
      x,
      upstream = Array(Array.empty[Int], Array(0), Array(1)),
      downstream = Array(Array(1), Array(2), Array.empty[Int]),
      pNorm = ps.map(Features.pNorm),
      labels = labels,
      jobCost = cost,
    )
  }
}

class GnnSpec extends AnyFunSuite {
  import GnnFixtures._

  test("embedding shape is n x hidden") {
    val enc = new GnnEncoder(Features.dim, hidden = 12, layers = 2, seed = 3)
    val e = enc.embed(chain(0.5, Array(1, 1, 1), Array(-1, -1, -1)))
    assert(e.length == 3 && e.forall(_.length == 12))
  }

  test("weights initialize deterministically from the seed") {
    val a = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 9)
    val b = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 9)
    val s = chain(0.3, Array(2, 2, 2), Array(-1, -1, -1))
    assert(a.embed(s).map(_.toVector).toVector == b.embed(s).map(_.toVector).toVector)
  }

  test("different seeds give different weights") {
    val a = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 9)
    val b = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 10)
    val s = chain(0.3, Array(2, 2, 2), Array(-1, -1, -1))
    assert(a.embed(s).map(_.toVector).toVector != b.embed(s).map(_.toVector).toVector)
  }

  // Analytic gradients vs central differences at several coordinates, for
  // both objectives — one test per coordinate keeps failures attributable.
  for (obj <- Seq(Gnn.BottleneckClassification, Gnn.JobCostRegression); r <- 0 until 2; c <- 0 until 3)
    test(s"gradient check $obj W0($r,$c)") {
      val enc = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 5, objective = obj)
      val s = chain(0.5, Array(3, 12, 40), Array(1, 0, 1), cost = 2.0)
      val (an, num) = enc.gradCheck(s, r, c)
      val rel = math.abs(an - num) / math.max(1e-8, math.max(math.abs(an), math.abs(num)))
      assert(rel < 1e-5 || (an == 0.0 && num == 0.0), s"analytic=$an numeric=$num")
    }

  test("training reduces the classification loss") {
    val enc = new GnnEncoder(Features.dim, hidden = 16, layers = 2, seed = 7)
    val data = (0 until 200).map { i =>
      val p = 1 + (DetRandom.unit("g", i) * 99).toInt
      val y = if (p < 10) 1 else 0
      chain(0.5, Array(p, p, p), Array(y, y, y))
    }
    val losses = enc.train(data, epochs = 25)
    assert(losses.last < losses.head * 0.9)
  }

  test("learns a pure parallelism threshold approximately") {
    val enc = new GnnEncoder(Features.dim, hidden = 16, layers = 3, seed = 7)
    val data = (0 until 400).map { i =>
      val p = 1 + (DetRandom.unit("toy", i) * 99).toInt
      val y = if (p < 10) 1 else 0
      chain(0.5, Array(p, p, p), Array(y, y, y))
    }
    enc.train(data, epochs = 20)
    val thr = (1 to 100).find { p =>
      enc.predictProbs(chain(0.5, Array(p, p, p), Array(-1, -1, -1)))(1) < 0.5
    }.getOrElse(101)
    assert(thr >= 4 && thr <= 25, s"learned threshold $thr, true 10")
  }

  test("learns a rate-dependent threshold direction") {
    val enc = new GnnEncoder(Features.dim, hidden = 16, layers = 3, seed = 9)
    val data = (0 until 1200).map { i =>
      val rate = DetRandom.unit("r", i)
      val p = 1 + (DetRandom.unit("p", i) * 99).toInt
      val y = if (p < 5 + rate * 40) 1 else 0
      chain(rate, Array(p, p, p), Array(y, y, y))
    }
    enc.train(data, epochs = 20)
    def thr(rate: Double) = (1 to 100).find { p =>
      enc.predictProbs(chain(rate, Array(p, p, p), Array(-1, -1, -1)))(1) < 0.5
    }.getOrElse(101)
    assert(thr(0.9) > thr(0.1), "higher rate must imply a higher threshold")
  }

  test("unlabeled nodes contribute no classification gradient") {
    val enc = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 5)
    val allUnlabeled = (0 until 20).map(_ => chain(0.5, Array(5, 5, 5), Array(-1, -1, -1)))
    val before = enc.predictProbs(allUnlabeled.head).toVector
    enc.train(allUnlabeled, epochs = 5)
    assert(enc.predictProbs(allUnlabeled.head).toVector == before)
  }

  test("embedding is parallelism-agnostic") {
    val enc = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 5)
    val a = chain(0.5, Array(1, 1, 1), Array(-1, -1, -1))
    val b = chain(0.5, Array(90, 90, 90), Array(-1, -1, -1))
    assert(enc.embed(a).map(_.toVector).toVector == enc.embed(b).map(_.toVector).toVector)
  }

  test("predictProbs IS parallelism-aware (FUSE sees p)") {
    val enc = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 5)
    val a = chain(0.5, Array(1, 1, 1), Array(-1, -1, -1))
    val b = chain(0.5, Array(90, 90, 90), Array(-1, -1, -1))
    assert(enc.predictProbs(a).toVector != enc.predictProbs(b).toVector)
  }

  test("regression objective learns a constant target") {
    val enc = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 5,
      objective = Gnn.JobCostRegression)
    val data = (0 until 50).map(_ => chain(0.5, Array(5, 5, 5), Array(-1, -1, -1), cost = 3.0))
    enc.train(data, epochs = 40)
    assert(math.abs(enc.predictJobCost(data.head) - 3.0) < 0.5)
  }

  test("jobCostFromEmbedding matches predictJobCost") {
    val enc = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 5,
      objective = Gnn.JobCostRegression)
    val s = chain(0.5, Array(3, 7, 9), Array(-1, -1, -1), cost = 1.0)
    assert(enc.predictJobCost(s) == enc.jobCostFromEmbedding(enc.embed(s), s.pNorm))
  }
}
