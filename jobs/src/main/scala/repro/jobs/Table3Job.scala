package repro.jobs

import repro.harness.Table3Harness

/** Reproduces Table 3 (dataset statistics) — one row per proxy graph. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("table3")
    try {
      val rows = Table3Harness.run(spark, JobSession.specs(args))
      println("=== Table 3: dataset statistics (proxy vs paper) ===")
      println(Table3Harness.format(rows))
    } finally spark.stop()
  }
}
