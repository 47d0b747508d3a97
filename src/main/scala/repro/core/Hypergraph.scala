package repro.core

/** Generic substrate for the (r,s) nucleus decomposition.
  *
  * The decomposition only ever sees r-cliques as opaque nodes and s-cliques
  * as fixed-arity hyperedges over them: k-core is (vertices, edges) with
  * arity 2, k-truss is (edges, triangles) with arity 3, and (3,4) is
  * (triangles, four-cliques) with arity 4. Peeling, SND, AND and the
  * degree-levels bound are all written once against this structure.
  *
  * @param numR    number of r-clique nodes (0..numR-1)
  * @param arity   r-cliques per s-clique, i.e. C(s, r) — constant per (r,s)
  * @param members flattened member lists: s-clique j owns
  *                ``members(j*arity until (j+1)*arity)``
  */
final class Hypergraph(val numR: Int, val arity: Int, val members: Array[Int]) {
  require(members.length % arity == 0, "members length must be a multiple of arity")

  /** Number of s-clique hyperedges. */
  val numS: Int = members.length / arity

  /** CSR incidence: r-clique -> indices of s-cliques containing it. */
  val incOff: Array[Int] = new Array[Int](numR + 1)
  val incS: Array[Int] = {
    var i = 0
    while (i < members.length) { incOff(members(i) + 1) += 1; i += 1 }
    i = 0
    while (i < numR) { incOff(i + 1) += incOff(i); i += 1 }
    val cur = java.util.Arrays.copyOf(incOff, numR)
    val out = new Array[Int](members.length)
    var j = 0
    while (j < numS) {
      var k = j * arity
      while (k < (j + 1) * arity) {
        val r = members(k)
        out(cur(r)) = j
        cur(r) += 1
        k += 1
      }
      j += 1
    }
    out
  }

  /** S-degree d_s(R): number of s-cliques containing r-clique ``r``. */
  @inline def degree(r: Int): Int = incOff(r + 1) - incOff(r)

  /** Fresh copy of all S-degrees (the τ₀ of the iterative algorithms). */
  def degrees: Array[Int] = Array.tabulate(numR)(degree)

  /** Largest S-degree over all r-cliques (0 for an empty hypergraph). */
  def maxDegree: Int = if (numR == 0) 0 else (0 until numR).map(degree).max

  /** Iterate the member r-cliques of s-clique ``s``. */
  @inline def foreachMember(s: Int)(f: Int => Unit): Unit = {
    var k = s * arity
    while (k < (s + 1) * arity) { f(members(k)); k += 1 }
  }

  /** Iterate the s-cliques incident to r-clique ``r``. */
  @inline def foreachIncident(r: Int)(f: Int => Unit): Unit = {
    var k = incOff(r)
    while (k < incOff(r + 1)) { f(incS(k)); k += 1 }
  }
}

object Hypergraph {

  /** Build from a list of s-cliques given as member id sequences (all of the
    * same arity). Convenience for tests and tiny graphs.
    */
  def fromSeqs(numR: Int, arity: Int, sCliques: Seq[Seq[Int]]): Hypergraph = {
    val flat = new Array[Int](sCliques.length * arity)
    var j = 0
    sCliques.foreach { sc =>
      require(sc.length == arity, s"s-clique $sc does not have arity $arity")
      require(sc.distinct.length == arity, s"s-clique $sc has repeated members")
      sc.foreach { r => flat(j) = r; j += 1 }
    }
    new Hypergraph(numR, arity, flat)
  }
}
