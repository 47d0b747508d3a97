package repro.jobs

import repro.harness.Table4Harness

/** Reproduces Table 4 (degree-levels bound vs SND vs AND iterations). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("table4")
    try {
      val rows = Table4Harness.run(spark, JobSession.specs(args))
      println("=== Table 4: iterations to convergence (measured vs paper) ===")
      println(Table4Harness.format(rows))
    } finally spark.stop()
  }
}
