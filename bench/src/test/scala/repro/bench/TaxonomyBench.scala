package repro.bench

import repro.core.Sparsifiers
import repro.graphs.Datasets
import repro.harness.Taxonomy
import repro.metrics.MetricInfo

/** Tables 1–3: taxonomies + dataset inventory, rendered from framework
  * metadata and the generated substitutes.
  */
class TaxonomyBench extends BenchBase {

  test("Table 1: metric applicability matrix") {
    val t = Taxonomy.table1
    println(t)
    MetricInfo.all.foreach(m => assert(t.contains(m.name)))
  }

  test("Table 2: sparsifier characteristics matrix") {
    val t = Taxonomy.table2
    println(t)
    Sparsifiers.all.foreach(s => assert(t.contains(s.abbrev)))
  }

  test("Table 3: dataset inventory at bench scale") {
    val t = Taxonomy.table3(spark, cfg.scale)
    println(t)
    Datasets.specs.foreach(d => assert(t.contains(d.name)))
  }

  test("Table 3: every substitute honours its directed/weighted/connected flags") {
    Datasets.specs.foreach { d =>
      assert(Taxonomy.datasetMatchesSpec(spark, d.name, cfg.scale), s"${d.name} mismatch")
    }
  }
}
