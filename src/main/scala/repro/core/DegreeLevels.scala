package repro.core

/** Degree levels (Definition 6) — the paper's convergence upper bound.
  *
  * Level L_i is the set of r-cliques of minimum S-degree once all earlier
  * levels (and every s-clique touching them) are removed. Theorem 3 shows
  * the r-cliques of L_i converge within i SND iterations, so the number of
  * levels bounds the iteration count of both SND and AND; Table 4 compares
  * this bound with the measured iteration counts.
  */
object DegreeLevels {

  /** Level index of every r-clique (0-based). */
  def levels(h: Hypergraph): Array[Int] = {
    val n = h.numR
    val level = new Array[Int](n)
    if (n == 0) return level
    val deg = h.degrees
    val removed = new Array[Boolean](n)
    val sDead = new Array[Boolean](h.numS)
    var remaining = n
    var lvl = 0
    val buf = new Array[Int](n)
    while (remaining > 0) {
      var minDeg = Int.MaxValue
      var i = 0
      while (i < n) {
        if (!removed(i) && deg(i) < minDeg) minDeg = deg(i)
        i += 1
      }
      var cnt = 0
      i = 0
      while (i < n) {
        if (!removed(i) && deg(i) == minDeg) { buf(cnt) = i; cnt += 1 }
        i += 1
      }
      // Remove the whole level at once, killing incident s-cliques and
      // decrementing surviving members' degrees.
      var j = 0
      while (j < cnt) {
        val r = buf(j)
        level(r) = lvl
        removed(r) = true
        h.foreachIncident(r) { s =>
          if (!sDead(s)) {
            sDead(s) = true
            h.foreachMember(s) { r2 => if (!removed(r2)) deg(r2) -= 1 }
          }
        }
        j += 1
      }
      remaining -= cnt
      lvl += 1
    }
    level
  }

  /** Number of levels (Table 4's "Degree Levels" row). */
  def count(h: Hypergraph): Int = {
    val l = levels(h)
    if (l.isEmpty) 0 else l.max + 1
  }
}
