package repro.core

import org.apache.spark.sql.DataFrame
import repro.cliques.{FourCliques, Triangles}
import repro.graph.{GraphOps, LocalGraph}

/** Bridges the distributed substrate (Spark clique enumeration) and the
  * shared-memory decomposition engines: enumerates edges/triangles/K4s with
  * Spark, collects them, and assembles the generic [[Hypergraph]] for each
  * of the three (r,s) instances the paper evaluates.
  */
object NucleusBuilder {

  /** Collected clique structure of one graph.
    *
    * ``tri`` is stride-3 flattened (a,b,c) with a < b < c; ``quad`` is
    * stride-4 flattened (a,b,c,d) with a < b < c < d. Vertex ids are the
    * degree-rank relabelled ids of the input graph.
    */
  final case class Materialized(graph: LocalGraph, tri: Array[Int], quad: Array[Int]) {
    def numTriangles: Int = tri.length / 3
    def numQuads: Int = quad.length / 4
  }

  /** Enumerate and collect everything up to s-cliques of size ``maxS``
    * (2 = edges only, 3 = + triangles, 4 = + four-cliques). The input edge
    * DataFrame is canonicalized and degree-rank relabelled here.
    */
  def materialize(edges: DataFrame, maxS: Int = 4): Materialized = {
    val relabeled = GraphOps.relabelByDegree(GraphOps.canonicalize(edges)).cache()
    try {
      val g = LocalGraph.fromEdges(relabeled)
      if (maxS <= 2) return Materialized(g, Array.emptyIntArray, Array.emptyIntArray)
      val triDf = Triangles.enumerate(relabeled).cache()
      try {
        val triRows = triDf.collect()
        val tri = new Array[Int](triRows.length * 3)
        var i = 0
        while (i < triRows.length) {
          val r = triRows(i)
          tri(3 * i) = r.getLong(0).toInt
          tri(3 * i + 1) = r.getLong(1).toInt
          tri(3 * i + 2) = r.getLong(2).toInt
          i += 1
        }
        if (maxS <= 3) return Materialized(g, tri, Array.emptyIntArray)
        val quadRows = FourCliques.enumerate(relabeled, triDf).collect()
        val quad = new Array[Int](quadRows.length * 4)
        i = 0
        while (i < quadRows.length) {
          val r = quadRows(i)
          quad(4 * i) = r.getLong(0).toInt
          quad(4 * i + 1) = r.getLong(1).toInt
          quad(4 * i + 2) = r.getLong(2).toInt
          quad(4 * i + 3) = r.getLong(3).toInt
          i += 1
        }
        Materialized(g, tri, quad)
      } finally triDf.unpersist()
    } finally relabeled.unpersist()
  }

  /** (1,2): r-cliques are vertices, s-cliques are edges. */
  def coreHypergraph(m: Materialized): Hypergraph = {
    val g = m.graph
    val flat = new Array[Int](2 * g.m)
    var e = 0
    while (e < g.m) {
      flat(2 * e) = g.edges(e)._1
      flat(2 * e + 1) = g.edges(e)._2
      e += 1
    }
    new Hypergraph(g.n, 2, flat)
  }

  /** (2,3): r-cliques are edges, s-cliques are triangles. */
  def trussHypergraph(m: Materialized): Hypergraph = {
    val g = m.graph
    val nT = m.numTriangles
    val flat = new Array[Int](3 * nT)
    var t = 0
    while (t < nT) {
      val a = m.tri(3 * t); val b = m.tri(3 * t + 1); val c = m.tri(3 * t + 2)
      flat(3 * t) = g.edgeId(a, b)
      flat(3 * t + 1) = g.edgeId(a, c)
      flat(3 * t + 2) = g.edgeId(b, c)
      t += 1
    }
    new Hypergraph(g.m, 3, flat)
  }

  /** (3,4): r-cliques are triangles, s-cliques are four-cliques. */
  def nucleus34Hypergraph(m: Materialized): Hypergraph = {
    val n = m.graph.n.toLong
    // Dense triple key (a*n + b)*n + c — fits a Long for n up to ~2M.
    def key(a: Int, b: Int, c: Int): Long = (a.toLong * n + b) * n + c
    val triId = new scala.collection.mutable.LongMap[Int](m.numTriangles * 2)
    var t = 0
    while (t < m.numTriangles) {
      triId(key(m.tri(3 * t), m.tri(3 * t + 1), m.tri(3 * t + 2))) = t
      t += 1
    }
    val nQ = m.numQuads
    val flat = new Array[Int](4 * nQ)
    var q = 0
    while (q < nQ) {
      val a = m.quad(4 * q); val b = m.quad(4 * q + 1)
      val c = m.quad(4 * q + 2); val d = m.quad(4 * q + 3)
      flat(4 * q) = triId(key(a, b, c))
      flat(4 * q + 1) = triId(key(a, b, d))
      flat(4 * q + 2) = triId(key(a, c, d))
      flat(4 * q + 3) = triId(key(b, c, d))
      q += 1
    }
    new Hypergraph(m.numTriangles, 4, flat)
  }

  /** Dispatch on the (r, s) pair the paper evaluates. */
  def hypergraph(m: Materialized, r: Int, s: Int): Hypergraph = (r, s) match {
    case (1, 2) => coreHypergraph(m)
    case (2, 3) => trussHypergraph(m)
    case (3, 4) => nucleus34Hypergraph(m)
    case _      => sys.error(s"unsupported (r,s) = ($r,$s); supported: (1,2) (2,3) (3,4)")
  }
}
