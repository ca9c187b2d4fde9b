package repro.metrics

import repro.SparkSpec
import repro.core.{GraphOps, Sparsifiers}
import repro.graphs.Datasets

class MaxFlowSpec extends SparkSpec {

  test("max flow on a unit path is 1") {
    val g = GraphOps.fromPairs(spark, "mf-p4", Seq((0, 1), (1, 2), (2, 3)), directed = false, 4)
    assert(MaxFlow.network(g).maxFlow(0, 3) === 1.0)
  }

  test("max flow on parallel disjoint paths adds up") {
    // two vertex-disjoint 0→3 paths
    val g = GraphOps.fromPairs(spark, "mf-par",
      Seq((0, 1), (1, 3), (0, 2), (2, 3)), directed = false, 4)
    assert(MaxFlow.network(g).maxFlow(0, 3) === 2.0)
  }

  test("max flow respects capacities (weighted bottleneck)") {
    val g = GraphOps.fromArrays(spark, "mf-w", Array(0, 1), Array(1, 2),
      Array(5.0, 2.0), directed = false, weighted = true, 3)
    assert(MaxFlow.network(g).maxFlow(0, 2) === 2.0)
  }

  test("classic CLRS directed network") {
    // s=0, t=5; known max flow 23
    val src = Array(0, 0, 1, 2, 2, 3, 3, 4, 4, 1)
    val dst = Array(1, 2, 3, 1, 4, 2, 5, 3, 5, 2)
    val cap = Array(16.0, 13.0, 12.0, 4.0, 14.0, 9.0, 20.0, 7.0, 4.0, 10.0)
    val g = GraphOps.fromArrays(spark, "mf-clrs", src, dst, cap, directed = true, weighted = true, 6)
    assert(MaxFlow.network(g).maxFlow(0, 5) === 23.0)
  }

  test("directed flow is asymmetric") {
    val g = GraphOps.fromPairs(spark, "mf-dir", Seq((0, 1), (1, 2)), directed = true, 3)
    val net = MaxFlow.network(g)
    assert(net.maxFlow(0, 2) === 1.0)
    assert(net.maxFlow(2, 0) === 0.0)
  }

  test("flow between disconnected vertices is 0") {
    val g = GraphOps.fromPairs(spark, "mf-disc", Seq((0, 1), (2, 3)), directed = false, 4)
    assert(MaxFlow.network(g).maxFlow(0, 3) === 0.0)
  }

  test("min-cut equals max-flow on the complete graph K4 (cut = degree)") {
    val k4 = GraphOps.fromPairs(spark, "mf-k4",
      Seq((0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)), directed = false, 4)
    assert(MaxFlow.network(k4).maxFlow(0, 3) === 3.0)
  }

  test("flow stretch of a graph vs itself is 1") {
    val g = Datasets.get(spark, "ca-HepPh", 0.08)
    val r = MaxFlow.flowStretch(g, g, nPairs = 40, seed = 1)
    assert(math.abs(r.meanStretch - 1.0) < 1e-12)
    assert(r.zeroFrac === 0.0)
  }

  test("flow stretch of a subgraph is ≤ 1") {
    val g = Datasets.get(spark, "ca-HepPh", 0.08)
    val h = Sparsifiers.random(g, 0.5, 1)
    val r = MaxFlow.flowStretch(g, h, nPairs = 40, seed = 2)
    assert(r.meanStretch <= 1.0 + 1e-12)
  }
}
