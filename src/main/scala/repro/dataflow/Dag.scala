package repro.dataflow

/** Logical dataflow operator types, mirroring the operator vocabulary of the
  * paper's workloads (Nexmark §V-A: map, filter, incremental join, sliding /
  * tumbling window joins; PQP: source, filter, join, aggregate).
  *
  * Each type carries a base per-core processing rate (records/second of
  * *useful time* per unit of parallelism) used by the simulator substrate.
  * Stateless operators scale near-linearly with parallelism; stateful ones
  * (joins, windows) pay a coordination penalty — see [[SimConstants]].
  */
sealed abstract class OpType(val name: String, val baseRate: Double, val stateful: Boolean)

object OpType {
  // Sources are generators: an under-provisioned source causes consumer lag,
  // not backpressure, so the substrate treats them as never-bottlenecked and
  // every tuner pins them at parallelism 1.
  case object Source     extends OpType("source",            1e12, stateful = false)
  case object Map        extends OpType("map",           200_000d, stateful = false)
  case object Filter     extends OpType("filter",        250_000d, stateful = false)
  case object FlatMap    extends OpType("flatMap",       120_000d, stateful = false)
  case object IncJoin    extends OpType("incJoin",        60_000d, stateful = true)
  case object WindowJoin extends OpType("windowJoin",     35_000d, stateful = true)
  case object WindowAgg  extends OpType("windowAgg",      80_000d, stateful = true)
  case object Agg        extends OpType("agg",           150_000d, stateful = true)
  case object Sink       extends OpType("sink",          900_000d, stateful = false)

  /** All operator types, in a stable order (used for one-hot encoding). */
  val all: Vector[OpType] =
    Vector(Source, Map, Filter, FlatMap, IncJoin, WindowJoin, WindowAgg, Agg, Sink)

  def fromName(n: String): OpType =
    all.find(_.name == n).getOrElse(throw new IllegalArgumentException(s"unknown op type: $n"))
}

/** Windowing characteristics of an operator (Table I: window type, policy,
  * length, sliding interval). `windowType` is "tumbling" or "sliding";
  * `policy` is "count" or "time". Lengths are in abstract units.
  */
final case class WindowSpec(
    windowType: String,
    policy: String,
    length: Double,
    slide: Double,
)

/** A logical dataflow operator with the full static feature set of Table I.
  *
  * `selectivity` is output-records-per-input-record (joins apply it to the
  * sum of both inputs). `costScale` multiplies the per-record cost of the
  * operator's type; the simulator derives it *deterministically from the
  * observable static features* (tuple widths, window length) so that a
  * learned model can, in principle, recover it — see
  * [[Simulator.costScale]].
  */
final case class Operator(
    id: String,
    opType: OpType,
    window: Option[WindowSpec] = None,
    joinKeyClass: String = "none",     // Table I: Join Key Class
    aggClass: String = "none",         // Table I: Aggregate Class
    aggKeyClass: String = "none",      // Table I: Aggregate Key Class
    aggFunction: String = "none",      // Table I: Aggregate Function
    tupleWidthIn: Int = 8,             // Table I: Tuple Width In
    tupleWidthOut: Int = 8,            // Table I: Tuple Width Out
    tupleDataType: String = "record",  // Table I: Tuple Data Type
    selectivity: Double = 1.0,
)

/** A logical dataflow DAG: operators plus directed edges (upstream ->
  * downstream). Parallelism is *not* part of the DAG — it is the quantity
  * being tuned, and is supplied per-run to the simulator.
  */
final case class Dag(
    name: String,
    ops: Vector[Operator],
    edges: Vector[(String, String)],
) {
  require(ops.map(_.id).distinct.size == ops.size, s"$name: duplicate operator ids")
  require(
    edges.forall { case (a, b) => byId.contains(a) && byId.contains(b) },
    s"$name: edge references unknown operator",
  )

  lazy val byId: Map[String, Operator] = ops.map(o => o.id -> o).toMap

  /** Downstream adjacency: op id -> ids it feeds. */
  lazy val downstream: Map[String, Vector[String]] =
    edges.groupBy(_._1).view.mapValues(_.map(_._2)).toMap.withDefaultValue(Vector.empty)

  /** Upstream adjacency: op id -> ids feeding it. */
  lazy val upstream: Map[String, Vector[String]] =
    edges.groupBy(_._2).view.mapValues(_.map(_._1)).toMap.withDefaultValue(Vector.empty)

  /** Source operators: no in-edges. */
  lazy val sources: Vector[Operator] = ops.filter(o => upstream(o.id).isEmpty)

  /** Sink operators: no out-edges. */
  lazy val sinks: Vector[Operator] = ops.filter(o => downstream(o.id).isEmpty)

  /** Operator ids in topological order. Fails on cycles (a dataflow DAG must
    * be acyclic).
    */
  lazy val topoOrder: Vector[String] = {
    val inDeg  = scala.collection.mutable.Map(ops.map(o => o.id -> upstream(o.id).size): _*)
    val queue  = scala.collection.mutable.Queue(ops.map(_.id).filter(inDeg(_) == 0): _*)
    val out    = Vector.newBuilder[String]
    var seen   = 0
    while (queue.nonEmpty) {
      val id = queue.dequeue()
      out += id
      seen += 1
      downstream(id).foreach { d =>
        inDeg(d) -= 1
        if (inDeg(d) == 0) queue.enqueue(d)
      }
    }
    require(seen == ops.size, s"$name: dataflow graph contains a cycle")
    out.result()
  }

  /** All strict descendants of `id` (transitive downstream closure). */
  def descendants(id: String): Set[String] = {
    val acc = scala.collection.mutable.Set.empty[String]
    def go(x: String): Unit = downstream(x).foreach { d =>
      if (acc.add(d)) go(d)
    }
    go(id)
    acc.toSet
  }

  def size: Int = ops.size
}
