package repro.synth

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.GraphOps

/** Deterministic synthetic graph generators (the paper evaluates on SNAP /
  * Network Repository graphs which cannot be downloaded here; DESIGN.md §3
  * documents the substitution). All generators return canonical edge
  * DataFrames (``u`` < ``v``, distinct, no self loops) and are deterministic
  * in their (parameters, seed).
  */
object GraphGen {

  /** Chung–Lu style power-law graph. Endpoints of ``mTarget`` candidate
    * edges are drawn independently with P(vertex rank i) ∝ (i+1)^(-gamma)
    * via the analytic inverse CDF; self loops and duplicates are dropped, so
    * the achieved edge count lands near (below) ``mTarget``. gamma in (0,1)
    * — larger gamma = heavier hubs.
    */
  def chungLu(spark: SparkSession, n: Long, mTarget: Long, gamma: Double,
              seed: Long = 42): DataFrame = {
    require(gamma > 0 && gamma < 1, s"gamma must be in (0,1), got $gamma")
    val draws = mTarget
    // For P(i) ∝ i^-gamma over i = 1..n the CDF is ~ (i/n)^(1-gamma), so
    // i = n * U^(1/(1-gamma)). Vertex id = i - 1.
    def draw(r: org.apache.spark.sql.Column): org.apache.spark.sql.Column =
      least(lit(n - 1), (lit(n) * pow(r, lit(1.0 / (1.0 - gamma)))).cast("long"))
    val raw = spark.range(draws).select(
      draw(rand(seed)).as("a"),
      draw(rand(seed + 1)).as("b"),
    )
    GraphOps.canonicalize(raw)
  }

  /** Erdős–Rényi G(n, m-target) by uniform endpoint sampling. */
  def erdosRenyi(spark: SparkSession, n: Long, mTarget: Long, seed: Long = 42): DataFrame = {
    val raw = spark.range(mTarget).select(
      (rand(seed) * n).cast("long").as("a"),
      (rand(seed + 1) * n).cast("long").as("b"),
    )
    GraphOps.canonicalize(raw)
  }

  /** Complete graph K_n — closed-form clique counts make it the main
    * correctness fixture (kappa: core n-1, truss n-2, (3,4) n-3).
    */
  def complete(spark: SparkSession, n: Int): DataFrame = {
    import spark.implicits._
    val pairs = for (u <- 0 until n; v <- u + 1 until n) yield (u.toLong, v.toLong)
    pairs.toDF("u", "v")
  }

  /** Union ``count`` planted cliques of the given ``size`` into the graph,
    * on vertex ids drawn deterministically from 0..n-1. Mimics graphs whose
    * K4 count is huge relative to |E| (facebook, web-NotreDame).
    */
  def withPlantedCliques(spark: SparkSession, edges: DataFrame, n: Long,
                         count: Int, size: Int, seed: Long = 7): DataFrame = {
    import spark.implicits._
    val rnd = new scala.util.Random(seed)
    val extra = (0 until count).flatMap { _ =>
      val members = scala.collection.mutable.LinkedHashSet.empty[Long]
      while (members.size < size) members += rnd.nextLong().abs % n
      val ms = members.toIndexedSeq
      for (i <- ms.indices; j <- i + 1 until ms.size) yield (ms(i), ms(j))
    }
    GraphOps.canonicalize(edges.union(extra.toDF("u", "v")))
  }

  /** The 6-vertex toy graph of the paper's Figure 3/5 (k-core walkthrough):
    * a triangle {b,c,d} with a path b–a–e–f hanging off it.
    * Ids: a=0, b=1, c=2, d=3, e=4, f=5.
    */
  def figure3Toy(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq((0L, 1L), (0L, 4L), (4L, 5L), (1L, 2L), (1L, 3L), (2L, 3L)).toDF("u", "v")
  }

  /** Same toy graph as local edge pairs (a=0 … f=5), for engine-level tests
    * that replay the paper's Figure 3/5 traces without a SparkSession.
    */
  val figure3ToyPairs: Array[(Int, Int)] =
    Array((0, 1), (0, 4), (4, 5), (1, 2), (1, 3), (2, 3))
}
