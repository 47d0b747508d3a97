package repro.metrics

/** The paper's *strict* adaptation of Kendall-Tau (§5.2): a pair (i, j) is
  * concordant iff both orderings strictly agree OR the pair is tied in both
  * lists (x_i = x_j and y_i = y_j); every other pair — including pairs tied
  * on one side only — is discordant. Score = (n⁺ − n⁻) / #pairs ∈ [−1, 1],
  * equal to 1 exactly when the two lists induce identical partitions and
  * order. Used to compare τ_t against the converged κ_s.
  */
object KendallTau {

  /** O(n²) reference implementation, for property tests. */
  def naive(x: Array[Int], y: Array[Int]): Double = {
    require(x.length == y.length)
    val n = x.length
    if (n < 2) return 1.0
    var conc = 0L
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        val agree =
          (x(i) < x(j) && y(i) < y(j)) || (x(i) > x(j) && y(i) > y(j)) ||
          (x(i) == x(j) && y(i) == y(j))
        if (agree) conc += 1
        j += 1
      }
      i += 1
    }
    val pairs = n.toLong * (n - 1) / 2
    (2.0 * conc - pairs) / pairs
  }

  /** O(n log n) implementation: strictly-concordant pairs are counted with a
    * Fenwick tree sweep over x-groups; both-tied pairs by hashing (x, y).
    * Since n⁻ = #pairs − n⁺, the score is 2·n⁺/#pairs − 1.
    */
  def strict(x: Array[Int], y: Array[Int]): Double = {
    require(x.length == y.length)
    val n = x.length
    if (n < 2) return 1.0

    // Both-tied pairs.
    val tied = new scala.collection.mutable.LongMap[Int]()
    var i = 0
    while (i < n) {
      val k = (x(i).toLong << 32) | (y(i).toLong & 0xffffffffL)
      tied(k) = tied.getOrElse(k, 0) + 1
      i += 1
    }
    var bothTied = 0L
    tied.foreachValue(c => bothTied += c.toLong * (c - 1) / 2)

    // Strictly concordant pairs: sort by (x, y); sweep x-groups in
    // increasing order, BIT over compressed y counts elements with smaller
    // x; query for strictly smaller y.
    val idx = Array.tabulate(n)(identity).sortBy(k => (x(k), y(k)))
    val ys = y.distinct.sorted
    val yRank = ys.zipWithIndex.toMap
    val bit = new Array[Int](ys.length + 1)
    def bitAdd(p0: Int): Unit = {
      var p = p0 + 1
      while (p <= ys.length) { bit(p) += 1; p += p & (-p) }
    }
    def bitSumBelow(p0: Int): Long = { // count of inserted y-ranks < p0
      var p = p0
      var s = 0L
      while (p > 0) { s += bit(p); p -= p & (-p) }
      s
    }
    var strictConc = 0L
    var g = 0
    while (g < n) {
      var e = g
      while (e < n && x(idx(e)) == x(idx(g))) e += 1
      var k = g
      while (k < e) { strictConc += bitSumBelow(yRank(y(idx(k)))); k += 1 }
      k = g
      while (k < e) { bitAdd(yRank(y(idx(k)))); k += 1 }
      g = e
    }

    val pairs = n.toLong * (n - 1) / 2
    (2.0 * (strictConc + bothTied) - pairs) / pairs
  }
}
