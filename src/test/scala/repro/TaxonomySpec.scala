package repro

import repro.core.{PruneRateControl, Sparsifiers}
import repro.harness.Taxonomy
import repro.metrics.MetricInfo

/** Verifies that the framework metadata reproduces the paper's Tables 1–2
  * row by row.
  */
class TaxonomySpec extends SparkSpec {

  test("Table 1 has the paper's 16 metrics") {
    assert(MetricInfo.all.size === 16)
  }

  test("Table 1: only #Communities and Clustering F1 are directed-unsupported") {
    val undirectedOnly = MetricInfo.all.filterNot(_.directed).map(_.name).toSet
    assert(undirectedOnly === Set("#Communities", "Clustering F1 Sim"))
  }

  test("Table 1: clustering coefficients and degree dist ignore weights") {
    val weightUnused = MetricInfo.all.filterNot(_.weightUsed).map(_.name).toSet
    assert(weightUnused === Set("Degree Dist.", "LCC", "MCC", "GCC"))
  }

  test("Table 1: distance metrics and flow restrict to finite pairs on unconnected graphs") {
    val finiteOnly = MetricInfo.all.filter(_.finitePairsOnly).map(_.name).toSet
    assert(finiteOnly === Set("Diameter", "Eccentricity", "APSP", "Min-cut/Max-flow"))
  }

  test("Table 1: every metric supports unconnected graphs (with footnotes)") {
    assert(MetricInfo.all.forall(_.unconnected))
  }

  test("Table 2: directed support flags match the paper") {
    val undirOnly = Sparsifiers.all.filterNot(_.supportsDirected).map(_.abbrev).toSet
    assert(undirOnly === Set("SF", "SP-3", "ER-w", "ER-u"))
  }

  test("Table 2: only ER-weighted changes weights") {
    assert(Sparsifiers.all.filter(_.changesWeights).map(_.abbrev) === Seq("ER-w"))
  }

  test("Table 2: deterministic flags match the paper") {
    val det = Sparsifiers.all.filter(_.deterministic).map(_.abbrev).toSet
    assert(det === Set("LD", "SF", "SP-3", "LS", "GS", "LSim", "SCAN"))
  }

  test("Table 2: prune-rate control classes match the paper") {
    import PruneRateControl._
    def prc(a: String) = Sparsifiers.byAbbrev(a).pruneRateControl
    assert(prc("RN") === Fine && prc("GS") === Fine && prc("SCAN") === Fine)
    assert(prc("ER-w") === Fine && prc("ER-u") === Fine)
    assert(prc("KN") === Coarse && prc("RD") === Coarse && prc("FF") === Coarse && prc("LS") === Coarse)
    assert(prc("SF") === NoControl && prc("SP-3") === NoControl)
  }

  test("Table 2: all sparsifiers support weighted and unconnected graphs") {
    assert(Sparsifiers.all.forall(_.supportsWeighted))
    assert(Sparsifiers.all.forall(_.supportsUnconnected))
  }

  test("rendered tables include every row") {
    val t1 = Taxonomy.table1
    MetricInfo.all.foreach(m => assert(t1.contains(m.name)))
    val t2 = Taxonomy.table2
    Sparsifiers.all.foreach(s => assert(t2.contains(s.abbrev)))
    val t3 = Taxonomy.table3(spark, 0.15)
    repro.graphs.Datasets.specs.foreach(d => assert(t3.contains(d.name)))
  }
}
