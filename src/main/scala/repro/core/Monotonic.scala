package repro.core

import repro.dataflow.DetRandom

/** One fine-tuning training row: parallelism-agnostic embedding `h`,
  * parallelism degree `p`, and the Algorithm-1 bottleneck label (0/1).
  */
final case class TrainRow(h: Array[Double], p: Int, label: Int)

/** The fine-tuned bottleneck-prediction model M_f of §IV-B: estimates
  * P(bottleneck | h, p). Implementations with `monotonic = true` guarantee
  * the probability is non-increasing in p — the paper's monotonic
  * constraint — which makes the minimum-parallelism search sound.
  */
trait FineTuneModel {
  def fit(rows: IndexedSeq[TrainRow]): Unit
  def bottleneckProb(h: Array[Double], p: Int): Double
  def monotonic: Boolean
  def name: String
}

object FineTuneModel {
  /** Probability below which an operator is declared safe (non-bottleneck)
    * during the parallelism search. Slightly below 0.5: prefer one extra
    * unit of parallelism over a backpressure incident.
    */
  val safeProb = 0.45

  /** Line 8 of Algorithm 2: the minimum parallelism whose predicted label
    * is 0. Binary search — sound when the model is monotonic; for the
    * non-monotonic NN ablation it is the same (now unsound) search, which
    * is exactly how the paper's Fig. 11a failure mode arises.
    */
  def minSafeParallelism(model: FineTuneModel, h: Array[Double], pMax: Int): Int = {
    var lo = 1
    var hi = pMax
    if (model.bottleneckProb(h, pMax) >= safeProb) return pMax
    while (lo < hi) {
      val mid = (lo + hi) / 2
      if (model.bottleneckProb(h, mid) < safeProb) hi = mid else lo = mid + 1
    }
    lo
  }
}

/** Kernelized monotonic classifier — the SVM variant of §IV-B(a).
  *
  * Eq. 4 separates the decision function into a kernelized part over the
  * embedding, `w_e . phi(h)`, and a linear monotone term in parallelism,
  * `w_p * p` with `w_p <= 0`. We realize exactly that structure in its
  * local (kernel-evaluation) form: for a query embedding h, training rows
  * are weighted by an RBF kernel in embedding space (adaptive bandwidth =
  * distance to the k-th neighbor), and the decision in p is a single
  * monotone cut at the weighted-misclassification-minimizing threshold
  * t(h) in log-parallelism — the separating hyperplane restricted to the p
  * axis, with monotonicity (probability non-increasing in p) holding by
  * construction for every h.
  *
  * `fit` stores the support set and invalidates the per-embedding threshold
  * cache, so online refits with appended feedback rows are cheap — the
  * "lightweight prediction layer" property §IV-B asks of M_f.
  */
final class MonotonicSvm(
    embedDim: Int,
    kNeighbors: Int = 16,
    sharpness: Double = 60.0, // logistic slope per log10-parallelism unit
    seed: Long = 13,
) extends FineTuneModel {
  override val name = "SVM"
  override val monotonic = true

  private var rows: Array[TrainRow] = Array.empty
  private val cache = new java.util.IdentityHashMap[Array[Double], java.lang.Double]()

  override def fit(data: IndexedSeq[TrainRow]): Unit = {
    rows = data.toArray
    cache.clear()
  }

  /** The monotone cut t(h) in pNorm (log10 p) units: predicted bottleneck
    * iff pNorm(p) < t(h).
    */
  def threshold(h: Array[Double]): Double = {
    val cached = cache.get(h)
    if (cached != null) return cached.doubleValue()
    val t = computeThreshold(h)
    cache.put(h, t)
    t
  }

  private def computeThreshold(h: Array[Double]): Double = {
    if (rows.isEmpty) return -0.5
    val n = rows.length
    val d2 = new Array[Double](n)
    var i = 0
    while (i < n) {
      var s = 0.0; val hi = rows(i).h; var j = 0
      while (j < embedDim) { val d = h(j) - hi(j); s += d * d; j += 1 }
      d2(i) = s
      i += 1
    }
    // Adaptive RBF bandwidth: squared distance to the k-th nearest row.
    val k = math.min(kNeighbors, n - 1)
    val sorted = d2.clone()
    java.util.Arrays.sort(sorted)
    val sigma2 = math.max(1e-9, sorted(math.max(0, k - 1)))
    val w = Array.tabulate(n)(i => math.exp(-d2(i) / (2.0 * sigma2)))

    // Sweep the cut over sorted log-parallelism values; minimize weighted
    // misclassification. label=1 at p_i wants t > pNorm(p_i); label=0 wants
    // t <= pNorm(p_i).
    val order = (0 until n).sortBy(i => rows(i).p).toArray
    var err = order.iterator.filter(i => rows(i).label == 1).map(w).sum // t = -inf
    var bestErr = err
    var bestT = -0.5
    var idx = 0
    while (idx < order.length) {
      val p = rows(order(idx)).p
      // Move the cut just above parallelism p (flip all rows at this p).
      while (idx < order.length && rows(order(idx)).p == p) {
        val i2 = order(idx)
        if (rows(i2).label == 1) err -= w(i2) else err += w(i2)
        idx += 1
      }
      if (err < bestErr - 1e-12) {
        bestErr = err
        bestT =
          if (idx >= order.length) Features.pNorm(p) + 0.15 // beyond all data
          else (Features.pNorm(p) + Features.pNorm(rows(order(idx)).p)) / 2.0
      }
    }
    bestT
  }

  override def bottleneckProb(h: Array[Double], p: Int): Double = {
    val t = threshold(h)
    1.0 / (1.0 + math.exp(-sharpness * (t - Features.pNorm(p))))
  }
}

/** Gradient-boosted decision trees with a monotone-decreasing constraint on
  * the parallelism feature (the paper's XGBoost variant, §IV-B(b)).
  *
  * Exact greedy splits on (h..., p) with logistic loss and Newton leaf
  * values; splits on the parallelism feature whose left (low-p) value is
  * below the right value are discarded (gain set to -inf), and value bounds
  * are propagated down both subtrees so the *whole ensemble* — not just
  * single splits — respects monotonicity.
  */
final class MonotonicGbt(
    embedDim: Int,
    rounds: Int = 30,
    depth: Int = 3,
    lr: Double = 0.3,
    lambda: Double = 1.0,
    minChild: Int = 5,
    enforceMonotone: Boolean = true,
) extends FineTuneModel {
  override val name = if (enforceMonotone) "XGBoost" else "GBT-unconstrained"
  override val monotonic: Boolean = enforceMonotone

  private val pIdx = embedDim // feature index of parallelism

  private sealed trait Node
  private final case class Leaf(value: Double) extends Node
  private final case class Split(feature: Int, thr: Double, left: Node, right: Node) extends Node

  private var trees: List[Node] = Nil
  private var base = 0.0

  private def featuresOf(r: TrainRow): Array[Double] = r.h :+ Features.pNorm(r.p)

  private def predictRaw(x: Array[Double]): Double = {
    var s = base
    trees.foreach { t =>
      var node = t
      var done = false
      while (!done) node match {
        case Leaf(v) => s += v; done = true
        case Split(f, thr, l, rgt) => node = if (x(f) <= thr) l else rgt
      }
    }
    s
  }

  override def bottleneckProb(h: Array[Double], p: Int): Double = {
    val x = h :+ Features.pNorm(p)
    1.0 / (1.0 + math.exp(-predictRaw(x)))
  }

  override def fit(rows: IndexedSeq[TrainRow]): Unit = {
    if (rows.isEmpty) return
    trees = Nil
    val xs = rows.map(featuresOf).toArray
    val ys = rows.map(_.label.toDouble).toArray
    val posRate = math.min(0.99, math.max(0.01, ys.sum / ys.length))
    base = math.log(posRate / (1 - posRate))
    val raw = Array.fill(ys.length)(base)
    var round = 0
    while (round < rounds) {
      val g = new Array[Double](ys.length)
      val h = new Array[Double](ys.length)
      var i = 0
      while (i < ys.length) {
        val p = 1.0 / (1.0 + math.exp(-raw(i)))
        g(i) = p - ys(i)
        h(i) = math.max(1e-6, p * (1 - p))
        i += 1
      }
      val tree = buildNode(xs, g, h, (0 until ys.length).toArray, depth,
        lo = Double.NegativeInfinity, hi = Double.PositiveInfinity)
      trees = trees :+ tree
      i = 0
      while (i < ys.length) {
        raw(i) += lr * leafValueFor(tree, xs(i))
        i += 1
      }
      round += 1
    }
  }

  private def leafValueFor(t: Node, x: Array[Double]): Double = t match {
    case Leaf(v)              => v
    case Split(f, thr, l, r) => if (x(f) <= thr) leafValueFor(l, x) else leafValueFor(r, x)
  }

  private def leafValue(g: Double, h: Double, lo: Double, hi: Double): Double =
    math.min(hi, math.max(lo, -g / (h + lambda)))

  private def buildNode(
      xs: Array[Array[Double]], g: Array[Double], h: Array[Double],
      idx: Array[Int], d: Int, lo: Double, hi: Double,
  ): Node = {
    val gSum = idx.map(g).sum
    val hSum = idx.map(h).sum
    val selfValue = leafValue(gSum, hSum, lo, hi)
    if (d == 0 || idx.length < 2 * minChild) return Leaf(selfValue)

    val nFeatures = xs(0).length
    var bestGain = 0.0
    var bestF = -1; var bestThr = 0.0
    var f = 0
    while (f < nFeatures) {
      val values = idx.map(i => xs(i)(f)).distinct.sorted
      if (values.length > 1) {
        val candidates =
          if (values.length <= 33) values.sliding(2).map(p => (p(0) + p(1)) / 2).toArray
          else Array.tabulate(32)(k => values((values.length - 1) * (k + 1) / 33))
        candidates.foreach { thr =>
          var gL = 0.0; var hL = 0.0; var nL = 0
          idx.foreach { i =>
            if (xs(i)(f) <= thr) { gL += g(i); hL += h(i); nL += 1 }
          }
          val nR = idx.length - nL
          if (nL >= minChild && nR >= minChild) {
            val gR = gSum - gL; val hR = hSum - hL
            val gain = gL * gL / (hL + lambda) + gR * gR / (hR + lambda) -
              gSum * gSum / (hSum + lambda)
            val monotoneOk =
              !enforceMonotone || f != pIdx || {
                // Decreasing in p: the low-p side must not predict lower.
                leafValue(gL, hL, lo, hi) >= leafValue(gR, hR, lo, hi)
              }
            if (gain > bestGain && monotoneOk) {
              bestGain = gain; bestF = f; bestThr = thr
            }
          }
        }
      }
      f += 1
    }
    if (bestF < 0) return Leaf(selfValue)

    val (li, ri) = idx.partition(i => xs(i)(bestF) <= bestThr)
    if (enforceMonotone && bestF == pIdx) {
      // Bound propagation: children on the low-p side stay >= mid, high-p
      // side stays <= mid, so monotonicity holds across whole subtrees.
      val wL = leafValue(li.map(g).sum, li.map(h).sum, lo, hi)
      val wR = leafValue(ri.map(g).sum, ri.map(h).sum, lo, hi)
      val mid = (wL + wR) / 2
      Split(bestF, bestThr,
        buildNode(xs, g, h, li, d - 1, mid, hi),
        buildNode(xs, g, h, ri, d - 1, lo, mid))
    } else {
      Split(bestF, bestThr,
        buildNode(xs, g, h, li, d - 1, lo, hi),
        buildNode(xs, g, h, ri, d - 1, lo, hi))
    }
  }
}

/** Plain MLP with no monotonic constraint — the NN ablation of Fig. 11a.
  * Deliberately the same capacity class as the other models; its failure
  * mode is structural (non-monotone decision boundary makes the binary
  * search unsound), not capacity.
  */
final class PlainNn(
    embedDim: Int,
    hidden: Int = 16,
    epochs: Int = 40,
    lr: Double = 0.05,
    seed: Long = 29,
) extends FineTuneModel {
  override val name = "NN"
  override val monotonic = false

  private val inDim = embedDim + 1
  private def g(tag: String, i: Int): Double = {
    val u1 = math.max(1e-12, DetRandom.unit(seed, tag, i, "u1"))
    val u2 = DetRandom.unit(seed, tag, i, "u2")
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2 * math.Pi * u2)
  }
  private val w1 = Array.tabulate(hidden * inDim)(i => g("w1", i) * math.sqrt(2.0 / inDim))
  private val b1 = new Array[Double](hidden)
  private val w2 = Array.tabulate(hidden)(i => g("w2", i) * math.sqrt(2.0 / hidden))
  private var b2 = 0.0

  private def forward(x: Array[Double]): (Array[Double], Double) = {
    val a = new Array[Double](hidden)
    var i = 0
    while (i < hidden) {
      var s = b1(i); var j = 0
      while (j < inDim) { s += w1(i * inDim + j) * x(j); j += 1 }
      a(i) = math.max(0.0, s)
      i += 1
    }
    var out = b2
    i = 0
    while (i < hidden) { out += w2(i) * a(i); i += 1 }
    (a, out)
  }

  override def bottleneckProb(h: Array[Double], p: Int): Double = {
    val x = h :+ Features.pNorm(p)
    1.0 / (1.0 + math.exp(-forward(x)._2))
  }

  override def fit(rows: IndexedSeq[TrainRow]): Unit = {
    if (rows.isEmpty) return
    val xs = rows.map(r => r.h :+ Features.pNorm(r.p)).toArray
    val ys = rows.map(_.label.toDouble).toArray
    var e = 0
    while (e < epochs) {
      var r = 0
      while (r < ys.length) {
        val (a, logit) = forward(xs(r))
        val p = 1.0 / (1.0 + math.exp(-logit))
        val dLogit = (p - ys(r)) * lr
        var i = 0
        while (i < hidden) {
          if (a(i) > 0) {
            val da = w2(i) * dLogit
            var j = 0
            while (j < inDim) { w1(i * inDim + j) -= da * xs(r)(j); j += 1 }
            b1(i) -= da
          }
          w2(i) -= dLogit * a(i)
          i += 1
        }
        b2 -= dLogit
        r += 1
      }
      e += 1
    }
  }
}
