package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Pure-dataflow SND: the update operator 𝒰 expressed as Catalyst joins and
  * aggregations over the membership relation, iterated to a fixpoint — the
  * DataFrame rendering of "Pregel-style iterative message passing".
  *
  * The membership relation has one row per (s-clique, contained r-clique).
  * One pass is:
  * {{{
  *   ρ(S,R)   = min τ of S's other members          (join + per-S sorted list)
  *   τ'(R)    = H({ρ(S,R) : S ∋ R})                 (groupBy(rid) + h-index)
  * }}}
  * Convergence is detected by counting changed rows; lineage is truncated
  * every pass with an eager localCheckpoint, which is what makes unbounded
  * iteration stable under Spark.
  */
object SndSpark {

  private val hIndexUdf = udf { xs: Seq[Int] => HIndex.naive(xs) }

  /** Membership DataFrame (sid, rid) of a local [[Hypergraph]], for tests
    * and jobs that want to drive the dataflow engine from the same input.
    */
  def membershipOf(spark: SparkSession, h: Hypergraph): DataFrame = {
    import spark.implicits._
    val rows = for (s <- 0 until h.numS; k <- 0 until h.arity)
      yield (s.toLong, h.members(s * h.arity + k).toLong)
    rows.toDF("sid", "rid")
  }

  /** Run to convergence.
    *
    * @param membership (sid, rid) rows; every s-clique must have >= 2 members
    * @param numR       size of the r-clique universe (rids are 0..numR-1;
    *                   rids absent from ``membership`` have κ = 0)
    * @return (DataFrame (rid, kappa), iterations-with-change)
    */
  def decompose(spark: SparkSession, membership: DataFrame, numR: Long,
                maxIters: Int = 1000): (DataFrame, Int) = {
    val mem = membership.select(col("sid").cast("long"), col("rid").cast("long"))
      .localCheckpoint(true)
    val rids = spark.range(numR).select(col("id").as("rid"))
    var tau = rids
      .join(mem.groupBy("rid").agg(count(lit(1)).cast("int").as("t")), Seq("rid"), "left")
      .select(col("rid"), coalesce(col("t"), lit(0)).as("tau"))
      .localCheckpoint(true)
    var iterations = 0
    var converged = false
    while (!converged && iterations < maxIters) {
      val j = mem.join(tau, Seq("rid"))
      val perS = j.groupBy("sid").agg(sort_array(collect_list(col("tau"))).as("ts"))
      // min over the *other* members: dropping one occurrence of R's own τ
      // from the sorted list leaves element_at(ts, 1) or (ts, 2).
      val rho = j.join(perS, Seq("sid")).select(
        col("rid"),
        when(col("tau") === element_at(col("ts"), 1), element_at(col("ts"), 2))
          .otherwise(element_at(col("ts"), 1)).as("rho"),
      )
      val newAgg = rho.groupBy("rid").agg(hIndexUdf(collect_list(col("rho"))).as("ntau"))
      val next = tau.join(newAgg, Seq("rid"), "left")
        .select(col("rid"), coalesce(col("ntau"), lit(0)).as("tau"), col("tau").as("prev"))
        .localCheckpoint(true)
      val changed = next.where(col("tau") =!= col("prev")).count()
      tau = next.select(col("rid"), col("tau"))
      if (changed == 0) converged = true else iterations += 1
    }
    (tau.select(col("rid"), col("tau").as("kappa")), iterations)
  }
}
