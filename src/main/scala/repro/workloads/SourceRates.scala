package repro.workloads

import repro.dataflow.DetRandom

/** Source-rate schedule of §V-A:
  *
  * A basic cycle of ten multipliers of the per-job source-rate unit Wu,
  * `[3, 7, 4, 2, 1, 10, 8, 5, 6, 9]`, is replicated to a sequence of 20;
  * six seeded permutations of that sequence are concatenated, giving 120
  * source-rate changes per query. Table II's Wu values live in
  * [[Workloads]].
  */
object SourceRates {

  /** The paper's basic cycle of rate multipliers. */
  val basicCycle: Vector[Int] = Vector(3, 7, 4, 2, 1, 10, 8, 5, 6, 9)

  /** The replicated 20-element sequence. */
  val replicated: Vector[Int] = basicCycle ++ basicCycle

  /** Deterministic Fisher-Yates shuffle from the substrate hash. */
  private def shuffle(xs: Vector[Int], seed: Long): Vector[Int] = {
    val a = xs.toArray
    var i = a.length - 1
    while (i > 0) {
      val j = (DetRandom.unit(seed, i) * (i + 1)).toInt
      val t = a(i); a(i) = a(j); a(j) = t
      i -= 1
    }
    a.toVector
  }

  /** The full 120-change pattern for one query (6 permutations x 20). */
  def pattern(queryKey: String, seed: Long = 2025): Vector[Int] =
    (0 until 6).toVector.flatMap(perm => shuffle(replicated, DetRandom.mix(seed, queryKey, perm)))
}
