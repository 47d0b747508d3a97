package repro.testutil

import repro.core.{Hypergraph, NucleusBuilder}
import repro.graph.LocalGraph

/** Driver-side graph fixtures and independent brute-force oracles for the
  * engine tests (no SparkSession needed).
  */
object TestGraphs {

  /** Deterministic G(n, p) as canonical (u < v) pairs. */
  def randomGraph(n: Int, p: Double, seed: Long): Array[(Int, Int)] = {
    val rnd = new scala.util.Random(seed)
    (for (u <- 0 until n; v <- u + 1 until n if rnd.nextDouble() < p)
      yield (u, v)).toArray
  }

  /** Brute-force triangle enumeration (a < b < c). */
  def triangles(pairs: Array[(Int, Int)]): Array[(Int, Int, Int)] = {
    val adj = adjacency(pairs)
    (for {
      (a, b) <- pairs
      c <- adj(b) if c > b && adj(a).contains(c)
    } yield (a, b, c)).sorted
  }

  /** Brute-force K4 enumeration (a < b < c < d). */
  def fourCliques(pairs: Array[(Int, Int)]): Array[(Int, Int, Int, Int)] = {
    val adj = adjacency(pairs)
    (for {
      (a, b, c) <- triangles(pairs)
      d <- adj(c) if d > c && adj(a).contains(d) && adj(b).contains(d)
    } yield (a, b, c, d)).sorted
  }

  private def adjacency(pairs: Array[(Int, Int)]): Map[Int, Set[Int]] = {
    val n = if (pairs.isEmpty) 0 else pairs.iterator.map(e => math.max(e._1, e._2)).max + 1
    (0 until n).map { v =>
      v -> pairs.iterator.collect {
        case (a, b) if a == v => b
        case (a, b) if b == v => a
      }.toSet
    }.toMap.withDefaultValue(Set.empty)
  }

  /** Build the Materialized structure locally (mirrors what the Spark path
    * collects) so [[NucleusBuilder]]'s hypergraph assembly is exercised
    * without a SparkSession. Vertex ids are used as-is (no degree
    * relabelling) — the decomposition is label-invariant.
    */
  def materialize(pairs: Array[(Int, Int)]): NucleusBuilder.Materialized = {
    val g = LocalGraph.fromPairs(pairs)
    val tri = triangles(pairs).flatMap(t => Array(t._1, t._2, t._3))
    val quad = fourCliques(pairs).flatMap(q => Array(q._1, q._2, q._3, q._4))
    NucleusBuilder.Materialized(g, tri, quad)
  }

  /** Hypergraph for (r, s) from raw pairs, all locally. */
  def hypergraph(pairs: Array[(Int, Int)], r: Int, s: Int): Hypergraph =
    NucleusBuilder.hypergraph(materialize(pairs), r, s)

  /** Independent κ_s oracle straight from Definitions 2–3: for every k,
    * compute the maximal sub-hypergraph where each surviving r-clique is
    * contained in >= k surviving s-cliques (an s-clique survives iff all its
    * members survive); survivors have κ_s >= k. O(maxdeg · iterations ·
    * size) — fine for test-sized graphs, and structurally unlike the bucket
    * peeling implementation it validates.
    */
  def kappaByDefinition(h: Hypergraph): Array[Int] = {
    val kappa = new Array[Int](h.numR)
    val maxDeg = h.maxDegree
    for (k <- 1 to maxDeg) {
      val alive = Array.fill(h.numR)(true)
      var changed = true
      while (changed) {
        changed = false
        for (r <- 0 until h.numR if alive(r)) {
          var d = 0
          h.foreachIncident(r) { s =>
            var all = true
            h.foreachMember(s) { r2 => if (!alive(r2)) all = false }
            if (all) d += 1
          }
          if (d < k) { alive(r) = false; changed = true }
        }
      }
      for (r <- 0 until h.numR if alive(r)) kappa(r) = k
    }
    kappa
  }

  /** The paper's Figure 3/5 toy graph as pairs (a=0 … f=5). */
  val fig3: Array[(Int, Int)] = repro.synth.GraphGen.figure3ToyPairs

  /** Complete graph K_n as pairs. */
  def complete(n: Int): Array[(Int, Int)] =
    (for (u <- 0 until n; v <- u + 1 until n) yield (u, v)).toArray
}
