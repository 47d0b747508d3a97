package repro.bench

import repro.SparkSpec
import repro.harness.Table3Harness
import repro.synth.Proxies

/** Reproduces Table 3: |V|, |E|, |triangles|, |K4| of every proxy graph,
  * printed alongside the paper's numbers for the original SNAP/NR graphs.
  */
class Table3DatasetStatsBench extends SparkSpec {

  test("Table 3: dataset statistics for all ten proxies") {
    val rows = Table3Harness.run(spark, Proxies.all)
    println()
    println("=== Table 3: dataset statistics (proxy vs paper) ===")
    println(Table3Harness.format(rows))
    println()
    assert(rows.size == Proxies.all.size)
    // Every proxy must actually exercise all three decompositions.
    for (r <- rows) {
      assert(r.v > 0 && r.e > 0, s"${r.name}: empty graph")
      assert(r.tri > 0, s"${r.name}: no triangles — (2,3) would be vacuous")
      assert(r.k4 > 0, s"${r.name}: no K4s — (3,4) would be vacuous")
    }
    // Locally-dense proxies must mimic the paper's K4/triangle skew:
    // web-NotreDame has far more K4s than triangles.
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("wnd-x").k4 > byName("wnd-x").tri,
           "wnd-x should be K4-heavy like web-NotreDame")
  }
}
