package repro.cliques

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed 4-clique (K4) enumeration.
  *
  * Extends each triangle a < b < c by a fourth vertex d > c that is adjacent
  * to all three, so every K4 is produced exactly once as (a, b, c, d) with
  * a < b < c < d. The extension joins run against the oriented edge list,
  * mirroring [[Triangles]].
  */
object FourCliques {

  /** All 4-cliques as rows (a, b, c, d) with a < b < c < d. */
  def enumerate(edges: DataFrame, triangles: DataFrame): DataFrame = {
    val ext = edges.select(col("u").as("c"), col("v").as("d"))
    val cand = triangles.join(ext, Seq("c")) // d adjacent to c, d > c
    val ad = edges.select(col("u").as("a"), col("v").as("d"))
    val bd = edges.select(col("u").as("b"), col("v").as("d"))
    cand
      .join(ad, Seq("a", "d"), "left_semi")
      .join(bd, Seq("b", "d"), "left_semi")
      .select(col("a"), col("b"), col("c"), col("d"))
  }

  /** Convenience: enumerate K4s straight from edges. */
  def enumerate(edges: DataFrame): DataFrame =
    enumerate(edges, Triangles.enumerate(edges))

  /** Total K4 count. */
  def count(edges: DataFrame): Long = enumerate(edges).count()

  /** Per-triangle K4 participation (a, b, c, k4) — the S-degree d_4 of each
    * triangle; triangles in no K4 get k4 = 0.
    */
  def perTriangleCounts(edges: DataFrame, triangles: DataFrame): DataFrame = {
    val q = enumerate(edges, triangles)
    val faces = q.select(col("a"), col("b"), col("c"))
      .union(q.select(col("a"), col("b"), col("d").as("c")))
      .union(q.select(col("a"), col("c").as("b"), col("d").as("c")))
      .union(q.select(col("b").as("a"), col("c").as("b"), col("d").as("c")))
    val counts = faces.groupBy("a", "b", "c")
      .agg(org.apache.spark.sql.functions.count(lit(1)).as("k4"))
    triangles.join(counts, Seq("a", "b", "c"), "left")
      .select(col("a"), col("b"), col("c"), coalesce(col("k4"), lit(0L)).as("k4"))
  }
}
