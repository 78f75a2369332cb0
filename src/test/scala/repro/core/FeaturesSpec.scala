package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.dataflow._
import repro.dataflow.TestDags
import repro.workloads.Workloads

class FeaturesSpec extends AnyFunSuite {

  private val plain = Operator("x", OpType.Filter, selectivity = 0.5)

  test("encoded vector has the declared dimension") {
    assert(Features.encode(plain, 0.0).length == Features.dim)
  }

  test("every workload operator encodes without error at every rate level") {
    Workloads.all.foreach { w =>
      (1 to 10).foreach { m =>
        val x = Features.encodeDag(w.dag, w.rates(m.toDouble, SimMode.Flink))
        assert(x.length == w.dag.ops.size)
        x.foreach(row => assert(row.length == Features.dim))
      }
    }
  }

  test("all features are finite and in [0, 1]") {
    Workloads.all.foreach { w =>
      Features.encodeDag(w.dag, w.rates(10, SimMode.Flink)).foreach { row =>
        row.foreach(v => assert(!v.isNaN && v >= 0.0 && v <= 1.0))
      }
    }
  }

  test("one-hot blocks have exactly one active entry per vocabulary") {
    val x = Features.encode(plain, 0.0)
    val blocks = Seq(
      OpType.all.size, Features.windowTypes.size, Features.windowPolicies.size,
      Features.joinKeyClasses.size, Features.aggClasses.size,
      Features.aggKeyClasses.size, Features.aggFunctions.size,
      Features.tupleDataTypes.size)
    var off = 0
    blocks.foreach { b =>
      assert(x.slice(off, off + b).sum == 1.0, s"block at $off")
      off += b
    }
  }

  test("Table I coverage: all twelve static features are encoded") {
    // Changing each Table I attribute changes the encoding.
    def enc(o: Operator) = Features.encode(o, 0.0).toVector
    val base = Operator("x", OpType.WindowJoin,
      window = Some(WindowSpec("tumbling", "time", 10, 10)),
      joinKeyClass = "long", aggClass = "long", aggKeyClass = "long",
      aggFunction = "min", tupleWidthIn = 8, tupleWidthOut = 8,
      tupleDataType = "record")
    val variants = Seq(
      base.copy(opType = OpType.IncJoin),
      base.copy(window = Some(WindowSpec("sliding", "time", 10, 5))),
      base.copy(window = Some(WindowSpec("tumbling", "count", 10, 10))),
      base.copy(window = Some(WindowSpec("tumbling", "time", 60, 60))),
      base.copy(window = Some(WindowSpec("tumbling", "time", 10, 3))),
      base.copy(joinKeyClass = "string"),
      base.copy(aggClass = "double"),
      base.copy(aggKeyClass = "none"),
      base.copy(aggFunction = "avg"),
      base.copy(tupleWidthIn = 1024),
      base.copy(tupleWidthOut = 1024),
      base.copy(tupleDataType = "joined"),
    )
    variants.foreach(v => assert(enc(v) != enc(base), s"variant $v did not change encoding"))
  }

  test("source rate only affects source-rate slots") {
    val a = Features.encode(plain, 0.0, 0.0)
    val b = Features.encode(plain, 1e6, 1e6)
    assert(a.zip(b).count { case (x, y) => x != y } == 2) // own rate + job rate
  }

  test("rate features grow monotonically with rate") {
    val r1 = Features.encode(plain, 1e3, 1e3)
    val r2 = Features.encode(plain, 1e6, 1e6)
    assert(r2(Features.dim - 3) > r1(Features.dim - 3)) // own source rate slot
    assert(r2(Features.dim - 1) > r1(Features.dim - 1)) // job rate slot
  }

  test("selectivity feature is monotone in selectivity") {
    val lo = Features.encode(plain.copy(selectivity = 0.1), 0.0)
    val hi = Features.encode(plain.copy(selectivity = 2.0), 0.0)
    assert(hi(Features.dim - 2) > lo(Features.dim - 2))
  }

  test("unknown categorical value is rejected") {
    assertThrows[IllegalArgumentException](
      Features.encode(plain.copy(joinKeyClass = "uuid"), 0.0))
  }

  test("pNorm is monotone and log-scaled") {
    assert(Features.pNorm(1) == 0.0)
    assert(math.abs(Features.pNorm(10) - 1.0) < 1e-12)
    assert(math.abs(Features.pNorm(100) - 2.0) < 1e-12)
    (1 until 100).foreach(p => assert(Features.pNorm(p + 1) > Features.pNorm(p)))
  }

  test("encodeDag broadcasts the job-level rate to every operator") {
    val d = TestDags.diamond
    val x = Features.encodeDag(d, Map("s1" -> 1e4, "s2" -> 1e4))
    val jobSlot = Features.dim - 1
    assert(x.map(_(jobSlot)).distinct.length == 1)
    assert(x(0)(jobSlot) > 0)
  }
}
