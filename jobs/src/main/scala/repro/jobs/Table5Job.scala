package repro.jobs

import repro.harness.Table5Harness

/** Reproduces Table 5 (peeling vs parallel AND runtimes) and prints the
  * Table 1 subset ((3,4) on twitter / web-NotreDame / wikipedia proxies).
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.session("table5")
    try {
      val rows = Table5Harness.run(spark, JobSession.specs(args))
      println("=== Table 5: decomposition runtime, peeling vs AND (measured vs paper) ===")
      println(Table5Harness.format(rows))
      println()
      println("=== Table 1 subset: (3,4) on TW / WND / WIKI ===")
      println(Table5Harness.format(Table5Harness.table1Subset(rows)))
    } finally spark.stop()
  }
}
