package repro.bench

import repro.SparkSpec
import repro.harness.{Harness, Table4Harness}
import repro.synth.Proxies

/** Reproduces Table 4: degree-levels bound vs SND vs AND iteration counts
  * for k-core, k-truss and (3,4) on all ten proxies.
  *
  * Shape assertions mirror the paper's findings: the bound is far above the
  * measured counts, and AND needs substantially fewer iterations than SND.
  */
class Table4IterationsBench extends SparkSpec {

  test("Table 4: iterations to convergence for all proxies and decompositions") {
    val rows = Table4Harness.run(spark, Proxies.all)
    println()
    println("=== Table 4: iterations (measured vs paper) ===")
    println(Table4Harness.format(rows))
    println()
    assert(rows.size == Proxies.all.size * 3)
    for (r <- rows) {
      assert(r.snd <= math.max(0, r.levels - 1), s"$r: SND exceeded the bound")
      assert(r.and <= r.snd, s"$r: AND slower than SND")
    }
    // Paper: SND converges within ~5% of the bound on average; stay well
    // below half the bound here, and AND should save iterations overall.
    for (d <- Harness.decomps) {
      val rs = rows.filter(_.decomp == d.label)
      val avgRatioSnd = rs.map(r => r.snd.toDouble / math.max(1, r.levels)).sum / rs.size
      assert(avgRatioSnd < 0.5, f"${d.label}: SND/bound ratio $avgRatioSnd%.2f not << 1")
      val avgSaving = rs.map(r => 1.0 - r.and.toDouble / math.max(1, r.snd)).sum / rs.size
      assert(avgSaving > 0.15, f"${d.label}: AND saves only ${avgSaving * 100}%.0f%% iterations")
    }
  }
}
