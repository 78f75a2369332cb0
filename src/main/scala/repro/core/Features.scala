package repro.core

import repro.dataflow.{Dag, Operator, OpType}

/** Initial feature-vector construction (§IV-A).
  *
  * Static features (Table I) are one-hot encoded (categoricals) or
  * normalized to [0,1] (numerics); the single dynamic feature included at
  * this stage is the operator's source rate (non-zero only for source
  * operators — the rate then reaches first-level downstream operators via
  * message passing). Parallelism is *excluded* here and injected later via
  * the FUSE layer (the paper's parallelism-handling strategy, §III).
  */
object Features {

  // Categorical vocabularies, in stable one-hot order.
  val windowTypes: Vector[String]   = Vector("none", "tumbling", "sliding")
  val windowPolicies: Vector[String] = Vector("none", "count", "time")
  val joinKeyClasses: Vector[String] = Vector("none", "long", "string", "int", "double")
  val aggClasses: Vector[String]     = Vector("none", "long", "double")
  val aggKeyClasses: Vector[String]  = Vector("none", "long")
  val aggFunctions: Vector[String]   = Vector("none", "sum", "count", "min", "max", "avg")
  val tupleDataTypes: Vector[String] =
    Vector("record", "bid", "auction", "person", "joined", "hotitem", "synthetic")

  // Normalization caps for numeric features (min-max to [0,1]; rates are
  // log-scaled because they span 5e2..1e8 records/s across modes).
  val maxWindowLength = 130.0
  val maxTupleWidth   = 40000.0
  val logRateCap      = 9.0 // log10 of 1e9 rec/s

  private def oneHot(vocab: Vector[String], value: String): Array[Double] = {
    val i = vocab.indexOf(value)
    require(i >= 0, s"value '$value' not in vocabulary $vocab")
    Array.tabulate(vocab.size)(j => if (j == i) 1.0 else 0.0)
  }

  /** Total input dimension of the encoder. */
  val dim: Int =
    OpType.all.size + windowTypes.size + windowPolicies.size + joinKeyClasses.size +
      aggClasses.size + aggKeyClasses.size + aggFunctions.size + tupleDataTypes.size +
      7 // windowLength, slideLength, widthIn, widthOut, sourceRate, selectivity, jobRate

  /** Encode one operator. `sourceRate` is the operator's own source rate in
    * records/s (0 for non-source operators); `jobRate` is the sum of all
    * the job's source rates — a job-level dynamic feature broadcast to
    * every node ("source rates" are per the paper a dynamic input; giving
    * each node direct sight of the total keeps operator embeddings sharply
    * rate-sensitive instead of relying on multi-hop propagation alone).
    */
  def encode(op: Operator, sourceRate: Double, jobRate: Double = 0.0): Array[Double] = {
    val typeHot = Array.tabulate(OpType.all.size)(j => if (OpType.all(j) == op.opType) 1.0 else 0.0)
    val wt  = oneHot(windowTypes, op.window.map(_.windowType).getOrElse("none"))
    val wp  = oneHot(windowPolicies, op.window.map(_.policy).getOrElse("none"))
    val jk  = oneHot(joinKeyClasses, op.joinKeyClass)
    val ac  = oneHot(aggClasses, op.aggClass)
    val akc = oneHot(aggKeyClasses, op.aggKeyClass)
    val af  = oneHot(aggFunctions, op.aggFunction)
    val tdt = oneHot(tupleDataTypes, op.tupleDataType)
    // Numeric features are log-scaled: an operator's minimal parallelism is
    // (required rate / per-core rate), a *product* of rate, upstream
    // selectivities and cost factors — in log space those compose
    // additively, which a message-passing network represents naturally.
    val numeric = Array(
      math.min(1.0, math.log1p(op.window.map(_.length).getOrElse(0.0)) / math.log1p(maxWindowLength)),
      math.min(1.0, math.log1p(op.window.map(_.slide).getOrElse(0.0)) / math.log1p(maxWindowLength)),
      math.min(1.0, math.log(op.tupleWidthIn / 8.0 + 1.0) / math.log(maxTupleWidth / 8.0)),
      math.min(1.0, math.log(op.tupleWidthOut / 8.0 + 1.0) / math.log(maxTupleWidth / 8.0)),
      math.min(1.0, math.log10(1.0 + sourceRate) / logRateCap),
      // Observed operator selectivity — a data-stream property recorded in
      // execution histories (§II-A). Log-scaled: a downstream operator's
      // required rate is the source rate times the *product* of upstream
      // selectivities, which message passing can then compose additively.
      math.min(1.0, math.max(0.0, (math.log10(math.max(0.05, op.selectivity)) + 1.4) / 1.8)),
      math.min(1.0, math.log10(1.0 + jobRate) / logRateCap),
    )
    typeHot ++ wt ++ wp ++ jk ++ ac ++ akc ++ af ++ tdt ++ numeric
  }

  /** Encode a whole DAG: one row per operator in `dag.ops` order. */
  def encodeDag(dag: Dag, sourceRates: Map[String, Double]): Array[Array[Double]] = {
    val jobRate = sourceRates.values.sum
    dag.ops.map(op => encode(op, sourceRates.getOrElse(op.id, 0.0), jobRate)).toArray
  }

  /** Parallelism normalized to [0,1] for the FUSE layer and M_f.
    * Log-scaled (monotone, so the monotonic constraint is unaffected): the
    * bottleneck condition p < p* becomes a difference of logs, linear in
    * the model's natural feature geometry.
    */
  def pNorm(p: Int): Double = math.log10(math.max(1, p).toDouble)
}
