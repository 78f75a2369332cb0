package repro.workloads

import repro.dataflow._

/** PQP query set (ZeroTune's synthetic parallel-query-processing workload,
  * §V-A): three templates — Linear (8 queries), 2-way-join (16), 3-way-join
  * (32) — covering linear chains, multi-way window joins and chained
  * filters, with tumbling and sliding windows and common streaming
  * operators (source, filter, map/flatMap, join, aggregate).
  *
  * Queries are generated deterministically from the template index: chain
  * lengths, filter selectivities, window kinds/lengths and tuple widths all
  * vary with the index, so the 56 queries span a range of DAG shapes and
  * per-operator costs. PQP operators are CPU-heavy (wide tuples), matching
  * their very low Table II source-rate units (5K / 0.5K / 0.25K rec/s).
  */
object Pqp {

  private def width(i: Int, variants: Int = 3): Int = 8192 << (i % variants)

  private def win(i: Int): WindowSpec = {
    val tumbling = i % 2 == 0
    val len      = 30.0 * (1 + i % 4)
    WindowSpec(
      windowType = if (tumbling) "tumbling" else "sliding",
      policy = if (i % 3 == 0) "count" else "time",
      length = len,
      slide = if (tumbling) len else len / 3.0,
    )
  }

  private val aggFns = Vector("sum", "count", "min", "max", "avg")

  /** Linear template: source -> filter -> (map|flatMap)^L -> agg -> sink. */
  def linear(i: Int): Workload = {
    require(i >= 0 && i < 8, "Linear has 8 queries")
    val w      = width(i)
    val filSel = Vector(0.4, 0.6, 0.8)(i % 3)
    val chainLen = 1 + i % 3
    val chain = (0 until chainLen).toVector.map { j =>
      if ((i + j) % 2 == 0)
        Operator(s"map$j", OpType.Map, tupleWidthIn = w, tupleWidthOut = w,
          tupleDataType = "synthetic", selectivity = 1.0)
      else
        Operator(s"flatMap$j", OpType.FlatMap, tupleWidthIn = w, tupleWidthOut = w,
          tupleDataType = "synthetic", selectivity = 1.5)
    }
    val ops = Vector(
      Operator("src", OpType.Source, tupleWidthIn = w, tupleWidthOut = w,
        tupleDataType = "synthetic"),
      Operator("filter", OpType.Filter, tupleWidthIn = w, tupleWidthOut = w,
        tupleDataType = "synthetic", selectivity = filSel),
    ) ++ chain ++ Vector(
      Operator("agg", OpType.Agg, aggClass = "double", aggKeyClass = "long",
        aggFunction = aggFns(i % aggFns.size), tupleWidthIn = w, tupleWidthOut = 64,
        tupleDataType = "synthetic", selectivity = 0.2),
      Operator("sink", OpType.Sink, tupleWidthIn = 64, tupleWidthOut = 64),
    )
    val ids   = ops.map(_.id)
    val edges = ids.zip(ids.tail).toVector
    Workload(s"Linear-$i", "Linear", Dag(s"pqp-linear-$i", ops, edges),
      unitsFlink = Map("src" -> 5e3), unitsTimely = None)
  }

  /** 2-way-join template: two filtered sources -> window join -> optional
    * aggregate -> sink.
    */
  def twoWayJoin(i: Int): Workload = {
    require(i >= 0 && i < 16, "2-way-join has 16 queries")
    val w  = width(i)
    val ws = win(i)
    val fSel1 = Vector(0.3, 0.5, 0.7, 0.9)(i % 4)
    val fSel2 = Vector(0.4, 0.6, 0.8, 1.0)((i / 4) % 4)
    val withAgg = i % 2 == 1
    val base = Vector(
      Operator("src1", OpType.Source, tupleWidthIn = w, tupleWidthOut = w,
        tupleDataType = "synthetic"),
      Operator("src2", OpType.Source, tupleWidthIn = w, tupleWidthOut = w,
        tupleDataType = "synthetic"),
      Operator("filter1", OpType.Filter, tupleWidthIn = w, tupleWidthOut = w,
        tupleDataType = "synthetic", selectivity = fSel1),
      Operator("filter2", OpType.Filter, tupleWidthIn = w, tupleWidthOut = w,
        tupleDataType = "synthetic", selectivity = fSel2),
      Operator("join", OpType.WindowJoin, window = Some(ws),
        joinKeyClass = Vector("long", "string", "int", "double")(i % 4),
        tupleWidthIn = w, tupleWidthOut = w + 256, tupleDataType = "joined",
        selectivity = 0.5),
    )
    val tail =
      if (withAgg)
        Vector(
          Operator("agg", OpType.Agg, aggClass = "double", aggKeyClass = "long",
            aggFunction = aggFns(i % aggFns.size), tupleWidthIn = w + 256,
            tupleWidthOut = 64, tupleDataType = "synthetic", selectivity = 0.2),
          Operator("sink", OpType.Sink, tupleWidthIn = 64, tupleWidthOut = 64),
        )
      else
        Vector(Operator("sink", OpType.Sink, tupleWidthIn = w + 256, tupleWidthOut = w + 256))
    val ops = base ++ tail
    val edges = Vector(
      "src1" -> "filter1", "src2" -> "filter2",
      "filter1" -> "join", "filter2" -> "join",
    ) ++ (if (withAgg) Vector("join" -> "agg", "agg" -> "sink")
          else Vector("join" -> "sink"))
    Workload(s"2-way-join-$i", "2-way-join", Dag(s"pqp-2way-$i", ops, edges),
      unitsFlink = Map("src1" -> 0.5e3, "src2" -> 0.5e3), unitsTimely = None)
  }

  /** 3-way-join template: three filtered sources -> join1 -> join2 ->
    * optional aggregate -> sink.
    */
  def threeWayJoin(i: Int): Workload = {
    require(i >= 0 && i < 32, "3-way-join has 32 queries")
    val w   = width(i)
    val ws1 = win(i)
    val ws2 = win(i + 1)
    val fSels = Vector(0.3, 0.5, 0.7, 0.9)
    val withAgg = i % 2 == 0
    val srcsAndFilters = (1 to 3).toVector.flatMap { s =>
      Vector(
        Operator(s"src$s", OpType.Source, tupleWidthIn = w, tupleWidthOut = w,
          tupleDataType = "synthetic"),
        Operator(s"filter$s", OpType.Filter, tupleWidthIn = w, tupleWidthOut = w,
          tupleDataType = "synthetic", selectivity = fSels((i + s) % 4)),
      )
    }
    val joins = Vector(
      Operator("join1", OpType.WindowJoin, window = Some(ws1),
        joinKeyClass = Vector("long", "string", "int", "double")(i % 4),
        tupleWidthIn = w, tupleWidthOut = w + 128, tupleDataType = "joined",
        selectivity = 0.5),
      Operator("join2", OpType.WindowJoin, window = Some(ws2),
        joinKeyClass = Vector("long", "string", "int", "double")((i / 4) % 4),
        tupleWidthIn = w + 128, tupleWidthOut = w + 256, tupleDataType = "joined",
        selectivity = 0.4),
    )
    val tail =
      if (withAgg)
        Vector(
          Operator("agg", OpType.Agg, aggClass = "double", aggKeyClass = "long",
            aggFunction = aggFns(i % aggFns.size), tupleWidthIn = w + 256,
            tupleWidthOut = 64, tupleDataType = "synthetic", selectivity = 0.2),
          Operator("sink", OpType.Sink, tupleWidthIn = 64, tupleWidthOut = 64),
        )
      else
        Vector(Operator("sink", OpType.Sink, tupleWidthIn = w + 256, tupleWidthOut = w + 256))
    val ops = srcsAndFilters ++ joins ++ tail
    val edges = Vector(
      "src1" -> "filter1", "src2" -> "filter2", "src3" -> "filter3",
      "filter1" -> "join1", "filter2" -> "join1",
      "join1" -> "join2", "filter3" -> "join2",
    ) ++ (if (withAgg) Vector("join2" -> "agg", "agg" -> "sink")
          else Vector("join2" -> "sink"))
    Workload(s"3-way-join-$i", "3-way-join", Dag(s"pqp-3way-$i", ops, edges),
      unitsFlink = Map("src1" -> 0.25e3, "src2" -> 0.25e3, "src3" -> 0.25e3),
      unitsTimely = None)
  }

  val linears: Vector[Workload]       = (0 until 8).toVector.map(linear)
  val twoWayJoins: Vector[Workload]   = (0 until 16).toVector.map(twoWayJoin)
  val threeWayJoins: Vector[Workload] = (0 until 32).toVector.map(threeWayJoin)

  val all: Vector[Workload] = linears ++ twoWayJoins ++ threeWayJoins
}

/** All evaluated workloads, Nexmark + PQP, keyed like the paper's tables. */
object Workloads {
  val all: Vector[Workload] = Nexmark.all ++ Pqp.all

  val groups: Vector[String] =
    Vector("Q1", "Q2", "Q3", "Q5", "Q8", "Linear", "2-way-join", "3-way-join")

  def byGroup(group: String): Vector[Workload] = all.filter(_.group == group)

  def byKey(key: String): Workload =
    all.find(_.key == key).getOrElse(throw new NoSuchElementException(key))
}
