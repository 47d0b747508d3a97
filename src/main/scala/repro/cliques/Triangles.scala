package repro.cliques

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed triangle enumeration over canonical edge DataFrames.
  *
  * Uses the classic oriented-wedge join: with edges oriented low-id to
  * high-id, every triangle a < b < c is produced exactly once as the wedge
  * (a,b),(a,c) closed by the edge (b,c). Feed ids relabelled by degree rank
  * ([[repro.graph.GraphOps.relabelByDegree]]) so hub fan-out stays bounded
  * on skewed graphs.
  */
object Triangles {

  /** All triangles as rows (a, b, c) with a < b < c. */
  def enumerate(edges: DataFrame): DataFrame = {
    val e1 = edges.select(col("u").as("a"), col("v").as("b"))
    val e2 = edges.select(col("u").as("a2"), col("v").as("c"))
    val wedges = e1.join(e2, col("a") === col("a2") && col("b") < col("c"))
      .select(col("a"), col("b"), col("c"))
    val closing = edges.select(col("u").as("b"), col("v").as("c"))
    wedges.join(closing, Seq("b", "c")).select(col("a"), col("b"), col("c"))
  }

  /** Total triangle count. */
  def count(edges: DataFrame): Long = enumerate(edges).count()

  /** Per-edge triangle participation (u, v, tri) — the S-degree d_3 of each
    * edge; edges in no triangle are included with tri = 0.
    */
  def perEdgeCounts(edges: DataFrame): DataFrame = {
    val t = enumerate(edges)
    val sides = t.select(col("a").as("u"), col("b").as("v"))
      .union(t.select(col("a").as("u"), col("c").as("v")))
      .union(t.select(col("b").as("u"), col("c").as("v")))
    val counts = sides.groupBy("u", "v")
      .agg(org.apache.spark.sql.functions.count(lit(1)).as("tri"))
    edges.join(counts, Seq("u", "v"), "left")
      .select(col("u"), col("v"), coalesce(col("tri"), lit(0L)).as("tri"))
  }
}
