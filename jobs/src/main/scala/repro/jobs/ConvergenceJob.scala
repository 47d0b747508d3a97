package repro.jobs

import repro.harness.ConvergenceHarness

/** Reproduces the §5.2 convergence statistics (prose behind Figures 1/6/7):
  * iterations to 90%/99% Kendall-Tau similarity and accuracy at the 40%/10%
  * active-ratio thresholds.
  */
object ConvergenceJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("convergence")
    try {
      val rows = ConvergenceHarness.run(spark, JobSession.specs(args))
      println("=== Sec 5.2 convergence: per graph ===")
      println(ConvergenceHarness.format(rows))
      println()
      println("=== Sec 5.2 convergence: averages vs paper ===")
      println(ConvergenceHarness.summarize(rows))
    } finally spark.stop()
  }
}
