package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle on a
  * classic SQL aggregation, proving the oracle wiring end to end (the graph
  * suites use the same oracle for clique enumeration).
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 1).count()
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 1).count()
    assert(a == b && a > 0)
  }

  test("pricing-summary style aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001, seed = 2).limit(2000).cache()
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("long").as("cnt"),
           round(sum(col("l_quantity")), 2).as("sum_qty"))
      .select(col("l_returnflag"), col("cnt"), col("sum_qty"))
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
    li.unpersist()
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, seed = 3)
      .groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000, seed = 3)
      .groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    assert(z > 3 * u, s"zipf max bucket $z should dwarf uniform max bucket $u")
  }
}
