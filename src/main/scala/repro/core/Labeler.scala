package repro.core

import repro.dataflow.{RunResult, SimConstants}

/** Algorithm 1: operator-level bottleneck identification.
  *
  * Given one executed deployment (a [[RunResult]]), produce per-operator
  * labels: 1 = bottleneck, 0 = not a bottleneck, -1 = unlabeled (the
  * presence of job-level backpressure makes the operator's upstream data
  * rate unrepresentative, so its sufficiency cannot be judged).
  */
object Labeler {

  def label(
      run: RunResult,
      threshold: Double = SimConstants.cpuThreshold,
  ): Map[String, Int] = {
    val dag = run.dag
    // Line 1: everything starts unlabeled.
    val labels = scala.collection.mutable.Map(dag.ops.map(_.id -> -1): _*)

    // Lines 2-6: no job-level backpressure => no bottlenecks anywhere.
    if (!run.jobBackpressure) {
      dag.ops.foreach(o => labels(o.id) = 0)
      return labels.toMap
    }

    // Line 7: operators under backpressure whose downstream operators are
    // all free of backpressure — the backpressure frontier.
    val frontier = dag.ops.filter { o =>
      run.ops(o.id).backpressured &&
      dag.downstream(o.id).forall(d => !run.ops(d).backpressured)
    }

    // Lines 8-16: examine the resource utilization of each frontier
    // operator's direct downstream operators.
    frontier.foreach { o =>
      dag.downstream(o.id).foreach { d =>
        labels(d) = if (run.ops(d).utilization > threshold) 1 else 0
      }
    }
    labels.toMap
  }
}
