package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.workloads.{Nexmark, Pqp}

class ClusteringSpec extends AnyFunSuite {

  // Mixed population: 8 linear chains, 8 two-way joins, 5 Nexmark queries.
  private lazy val graphs =
    (Pqp.linears ++ Pqp.twoWayJoins.take(8) ++ Nexmark.all).map(w => LabeledGraph.from(w.dag))

  test("kmeans assigns every graph to a valid cluster") {
    val r = Clustering.kmeans(graphs, k = 3)
    assert(r.assignment.size == graphs.size)
    assert(r.assignment.forall(c => c >= 0 && c < 3))
    assert(r.centers.size == 3)
  }

  test("kmeans is deterministic in its seed") {
    val a = Clustering.kmeans(graphs, k = 3, seed = 5)
    val b = Clustering.kmeans(graphs, k = 3, seed = 5)
    assert(a == b)
  }

  test("each graph is nearest to its own cluster's center") {
    val r = Clustering.kmeans(graphs, k = 3)
    graphs.indices.foreach { i =>
      val own = Ged.distance(graphs(i), graphs(r.centers(r.assignment(i))))
      r.centers.foreach { c =>
        assert(own <= Ged.distance(graphs(i), graphs(c)) + 1e-9)
      }
    }
  }

  test("identical-structure graphs land in the same cluster") {
    val r = Clustering.kmeans(graphs, k = 3)
    // linear(0) and linear(6) share chain length AND map/flatMap pattern.
    val sameShape = Seq(0, 6)
    val clustersOf = sameShape.map(r.assignment)
    assert(clustersOf.distinct.size == 1)
  }

  test("similarity center maximizes the appearance count (Definition 2)") {
    val cluster = graphs.indices.take(10)
    val counts = Clustering.appearanceCounts(graphs, cluster, tau = 5.0)
    val sc = Clustering.similarityCenter(graphs, cluster, tau = 5.0)
    assert(counts(sc) == counts.values.max)
  }

  test("appearance count of a graph includes itself (ged = 0 <= tau)") {
    val cluster = graphs.indices.take(6)
    val counts = Clustering.appearanceCounts(graphs, cluster, tau = 1.0)
    cluster.foreach(i => assert(counts(i) >= 1))
  }

  test("direct and LSa similarity centers agree") {
    val cluster = graphs.indices.take(8)
    val a = Clustering.similarityCenter(graphs, cluster, tau = 5.0, useLsa = true)
    val b = Clustering.similarityCenter(graphs, cluster, tau = 5.0, useLsa = false)
    assert(a == b)
  }

  test("wcss decreases (weakly) as k grows") {
    val w2 = Clustering.kmeans(graphs, k = 2).wcss
    val w5 = Clustering.kmeans(graphs, k = 5).wcss
    assert(w5 <= w2 + 1e-9)
  }

  test("elbowK returns a k inside the requested range") {
    val k = Clustering.elbowK(graphs, 2 to 5)
    assert(k >= 2 && k <= 5)
  }

  test("singleton population clusters trivially") {
    val solo = IndexedSeq(graphs.head)
    val r = Clustering.kmeans(solo, k = 1)
    assert(r.assignment == Vector(0) && r.wcss == 0.0)
  }

  test("empty cluster has no similarity center") {
    assertThrows[IllegalArgumentException](
      Clustering.similarityCenter(graphs, Seq.empty, tau = 5.0))
  }
}
