package repro.jobs

import repro.core._
import repro.dataflow.DetRandom

/** Sanity: (1) analytic vs numeric gradients; (2) can the encoder learn a
  * pure parallelism threshold (label = p < 10) on a fixed 3-node chain;
  * (3) can it learn a rate-dependent threshold (label = p < rateFeature*20).
  */
object GnnToy {
  private def chain(rate: Double, ps: Array[Int], labels: Array[Int]): GraphSample = {
    val f = Features.dim
    val x = Array.tabulate(3) { i =>
      val a = new Array[Double](f)
      a(i) = 1.0                 // distinguish positions
      a(f - 2) = rate            // pretend log-rate slot
      a
    }
    GraphSample(
      x,
      upstream = Array(Array.empty[Int], Array(0), Array(1)),
      downstream = Array(Array(1), Array(2), Array.empty[Int]),
      pNorm = ps.map(Features.pNorm),
      labels = labels,
      jobCost = 0.0,
    )
  }

  def main(args: Array[String]): Unit = {
    // (1) gradient check
    val enc0 = new GnnEncoder(Features.dim, hidden = 8, layers = 2, seed = 5)
    val s0 = chain(0.5, Array(3, 12, 40), Array(1, 0, 1))
    var maxRel = 0.0
    for (r <- 0 until 3; c <- 0 until 5) {
      val (an, num) = enc0.gradCheck(s0, r, c)
      val rel = math.abs(an - num) / math.max(1e-8, math.max(math.abs(an), math.abs(num)))
      if (an != 0.0 || num != 0.0) maxRel = math.max(maxRel, rel)
    }
    println(f"grad check max rel err: $maxRel%.2e")

    // (2) pure p-threshold
    val enc1 = new GnnEncoder(Features.dim, hidden = 16, layers = 3, seed = 7)
    val data1 = (0 until 400).map { i =>
      val p = 1 + (DetRandom.unit("toy", i) * 99).toInt
      chain(0.5, Array(p, p, p), Array(if (p < 10) 1 else 0, if (p < 10) 1 else 0, if (p < 10) 1 else 0))
    }
    val l1 = enc1.train(data1, epochs = 20)
    println(f"p-threshold: loss ${l1.head}%.4f -> ${l1.last}%.4f")
    val thr = (1 to 100).find { p =>
      enc1.predictProbs(chain(0.5, Array(p, p, p), Array(-1, -1, -1)))(1) < 0.5
    }.getOrElse(101)
    println(s"learned threshold (true 10): $thr")

    // (3) rate-dependent threshold: p* = 5 + rate*40
    val enc2 = new GnnEncoder(Features.dim, hidden = 16, layers = 3, seed = 9)
    val data2 = (0 until 1500).map { i =>
      val rate = DetRandom.unit("toy2", i)
      val p = 1 + (DetRandom.unit("toy2b", i) * 99).toInt
      val y = if (p < 5 + rate * 40) 1 else 0
      chain(rate, Array(p, p, p), Array(y, y, y))
    }
    val l2 = enc2.train(data2, epochs = 20)
    println(f"rate-threshold: loss ${l2.head}%.4f -> ${l2.last}%.4f")
    for (rate <- Vector(0.1, 0.5, 0.9)) {
      val thr2 = (1 to 100).find { p =>
        enc2.predictProbs(chain(rate, Array(p, p, p), Array(-1, -1, -1)))(1) < 0.5
      }.getOrElse(101)
      println(f"rate=$rate%.1f learned thr: $thr2 (true ${5 + rate * 40}%.0f)")
    }
  }
}
