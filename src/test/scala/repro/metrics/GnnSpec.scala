package repro.metrics

import breeze.linalg.DenseMatrix
import repro.SparkSpec
import repro.core.{GraphOps, Sparsifiers}
import repro.graphs.Datasets

class GnnSpec extends SparkSpec {

  // ---- AUROC ----
  test("auroc of a perfect classifier is 1") {
    val scores = Array(0.1, 0.2, 0.8, 0.9)
    val pos = Array(false, false, true, true)
    assert(Gnn.auroc(scores, pos) === 1.0)
  }

  test("auroc of an inverted classifier is 0") {
    val scores = Array(0.9, 0.8, 0.2, 0.1)
    val pos = Array(false, false, true, true)
    assert(Gnn.auroc(scores, pos) === 0.0)
  }

  test("auroc of a constant classifier is 0.5 (ties averaged)") {
    val scores = Array(0.5, 0.5, 0.5, 0.5)
    val pos = Array(false, true, false, true)
    assert(Gnn.auroc(scores, pos) === 0.5)
  }

  test("auroc degenerate classes return 0.5") {
    assert(Gnn.auroc(Array(0.1, 0.9), Array(true, true)) === 0.5)
  }

  // ---- propagation ----
  test("propagation over an edgeless graph is the identity") {
    val base = GraphOps.fromPairs(spark, "gnn-one", Seq((0, 1)), directed = false, 3)
    val empty = base.withEdges(base.edges.limit(0), "empty")
    val x = DenseMatrix((1.0, 0.0), (0.0, 1.0), (2.0, 2.0))
    val h = Gnn.propagate(empty, x, hops = 2)
    assert(h === x)
  }

  test("propagation averages neighbour features") {
    val g = GraphOps.fromPairs(spark, "gnn-pair", Seq((0, 1)), directed = false, 2)
    val x = DenseMatrix((2.0), (0.0))
    val h = Gnn.propagate(g, x, hops = 1)
    assert(math.abs(h(0, 0) - 1.0) < 1e-12)
    assert(math.abs(h(1, 0) - 1.0) < 1e-12)
  }

  test("restricted propagation ignores cross-cluster edges") {
    val g = GraphOps.fromPairs(spark, "gnn-cross", Seq((0, 1)), directed = false, 2)
    val x = DenseMatrix((2.0), (0.0))
    val h = Gnn.propagate(g, x, hops = 1, restrict = Some(Array(0, 1)))
    assert(h(0, 0) === 2.0 && h(1, 0) === 0.0)
  }

  // ---- softmax training ----
  test("softmax regression separates linearly separable data") {
    val h = DenseMatrix((1.0, 0.0), (0.9, 0.1), (0.0, 1.0), (0.1, 0.9))
    val y = Array(0, 0, 1, 1)
    val mask = Array(true, true, true, true)
    val w = Gnn.trainSoftmax(h, y, mask, numClasses = 2, epochs = 200)
    val p = Gnn.predictProbs(h, w)
    assert(p(0, 0) > 0.5 && p(1, 0) > 0.5 && p(2, 1) > 0.5 && p(3, 1) > 0.5)
  }

  // ---- end-to-end ----
  test("SAGE-like GNN on the SBM dataset beats chance and MLP-only") {
    val data = Datasets.gnn(spark, "Reddit", 0.25)
    val g = data.graph
    val full = Gnn.run(Gnn.SageLike, g, g, data)
    val mlp = Gnn.run(Gnn.MlpOnly, g, g, data)
    assert(full.accuracy > 1.0 / data.numClasses + 0.1, s"GNN acc ${full.accuracy}")
    assert(full.accuracy > mlp.accuracy, s"graph should help: ${full.accuracy} vs ${mlp.accuracy}")
  }

  test("binary proteins-like task yields AUROC above 0.5") {
    val data = Datasets.gnn(spark, "ogbn-proteins", 0.25)
    val g = data.graph
    val r = Gnn.run(Gnn.SageLike, g, g, data)
    assert(r.auroc > 0.6, s"AUROC ${r.auroc}")
  }

  test("training on a sparsified graph, testing on full (paper §3.3.4)") {
    val data = Datasets.gnn(spark, "Reddit", 0.25)
    val g = data.graph
    val h = Sparsifiers.random(g, 0.5, 1)
    val r = Gnn.run(Gnn.SageLike, h, g, data)
    assert(r.accuracy > 1.0 / data.numClasses, s"sparsified-train acc ${r.accuracy}")
  }

  test("ClusterGCN-like model runs end to end") {
    val data = Datasets.gnn(spark, "Reddit", 0.25)
    val g = data.graph
    val r = Gnn.run(Gnn.ClusterGcnLike, g, g, data)
    assert(r.accuracy > 1.0 / data.numClasses)
  }
}
