package repro.core.sparsifiers

import repro.core.{GraphOps, SparkGraph}

/** Compact driver-side adjacency for the inherently sequential sparsifiers
  * (Rank Degree's frontier expansion, Forest Fire's random walks, Kruskal,
  * the greedy spanner). Arcs carry the index of the canonical edge they came
  * from, so a kept-edge bitset maps straight back to edge arrays.
  *
  * @param n        number of vertices (vertex ids 0 until n)
  * @param directed whether arcs are one-way (out-adjacency) or symmetrized
  */
final class DriverAdj(
    val n: Int,
    val src: Array[Int],
    val dst: Array[Int],
    val wt: Array[Double],
    val directed: Boolean) {

  val m: Int = src.length

  /** CSR offsets/targets over arcs; undirected edges appear in both lists. */
  val (offsets, nbrs, arcEdge): (Array[Int], Array[Int], Array[Int]) = {
    val degs = new Array[Int](n + 1)
    var i = 0
    while (i < m) {
      degs(src(i) + 1) += 1
      if (!directed) degs(dst(i) + 1) += 1
      i += 1
    }
    i = 1
    while (i <= n) { degs(i) += degs(i - 1); i += 1 }
    val off = degs.clone()
    val tgt = new Array[Int](if (directed) m else 2 * m)
    val eid = new Array[Int](tgt.length)
    val cur = degs.clone()
    i = 0
    while (i < m) {
      tgt(cur(src(i))) = dst(i); eid(cur(src(i))) = i; cur(src(i)) += 1
      if (!directed) { tgt(cur(dst(i))) = src(i); eid(cur(dst(i))) = i; cur(dst(i)) += 1 }
      i += 1
    }
    (off, tgt, eid)
  }

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Iterate (neighbour, edgeIndex) pairs of v. */
  @inline def foreachNbr(v: Int)(f: (Int, Int) => Unit): Unit = {
    var i = offsets(v)
    while (i < offsets(v + 1)) { f(nbrs(i), arcEdge(i)); i += 1 }
  }
}

object DriverAdj {
  /** Collect a SparkGraph to the driver. */
  def fromGraph(g: SparkGraph): DriverAdj = {
    val (s, d, w) = GraphOps.collectEdges(g)
    new DriverAdj(g.numVertices.toInt, s, d, w, g.directed)
  }

  /** Rebuild a SparkGraph from the subset of edges flagged in `keep`. */
  def subgraph(g: SparkGraph, adj: DriverAdj, keep: java.util.BitSet, suffix: String): SparkGraph = {
    val ks = Array.newBuilder[Int]; val kd = Array.newBuilder[Int]; val kw = Array.newBuilder[Double]
    var i = 0
    while (i < adj.m) {
      if (keep.get(i)) { ks += adj.src(i); kd += adj.dst(i); kw += adj.wt(i) }
      i += 1
    }
    GraphOps.fromArrays(g.spark, s"${g.name}#$suffix", ks.result(), kd.result(), kw.result(),
      g.directed, g.weighted, g.numVertices)
  }
}
