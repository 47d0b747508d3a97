package repro.bench

import repro.SparkSpec
import repro.harness.ConvergenceHarness
import repro.synth.Proxies

/** Reproduces the §5.2 convergence statistics (the prose behind Figures
  * 1/6/7): iterations to 90% / 99% strict Kendall-Tau similarity and the
  * accuracy reached when the active-r-clique ratio crosses 40% / 10%.
  */
class ConvergenceBench extends SparkSpec {

  test("§5.2: few iterations give close decompositions; active ratio tracks accuracy") {
    val rows = ConvergenceHarness.run(spark, Proxies.all)
    println()
    println("=== Sec 5.2 convergence: per graph ===")
    println(ConvergenceHarness.format(rows))
    println()
    println("=== Sec 5.2 convergence: averages vs paper ===")
    println(ConvergenceHarness.summarize(rows))
    println()
    assert(rows.size == Proxies.all.size * 3)
    for (r <- rows) {
      assert(r.itersTo90 <= r.itersTo99)
      assert(r.itersTo99 <= r.totalIters + 1)
    }
    // Paper's shape: ~90% similarity within a small fraction of the run,
    // and near-perfect accuracy once under 10% of r-cliques remain active.
    val avg90 = rows.map(_.itersTo90.toDouble).sum / rows.size
    val avgTotal = rows.map(_.totalIters.toDouble).sum / rows.size
    assert(avg90 <= 0.6 * avgTotal,
           f"90%% similarity should come early: $avg90%.1f vs $avgTotal%.1f total")
    val avgAcc10 = rows.map(_.accAt10).sum / rows.size
    assert(avgAcc10 > 0.9, f"accuracy at <10%% active only ${avgAcc10 * 100}%.1f%%")
  }
}
