package repro.core

/** AND — Asynchronous Nucleus Decomposition (Algorithm 3).
  *
  * Gauss-Seidel-style iteration: each r-clique reads the *latest* τ values
  * of its neighbours, which never increases any τ (Theorem 1) and therefore
  * only accelerates convergence; the worst interleaving degrades to SND. The
  * optional notification mechanism (the orange lines of Algorithm 3) keeps a
  * per-r-clique active flag so plateaued r-cliques are skipped until a
  * neighbour's update could actually change their h-index.
  *
  * With threads = 1 the run is deterministic in the given processing order
  * (Theorem 4: the non-decreasing-κ order converges in one iteration). With
  * threads > 1 the flags race benignly, exactly as in the paper's OpenMP
  * implementation — a missed in-pass notification is caught by the next
  * pass, bounded by the synchronous behaviour.
  */
object And {

  /** Run AND to convergence.
    *
    * @param h           the (r,s) hypergraph
    * @param threads     parallel workers per pass (1 = deterministic)
    * @param notify      enable the notification mechanism (orange lines)
    * @param order       processing order over r-cliques (default natural);
    *                    ignored meaningfully only for threads = 1
    * @param onIteration optional observer: (pass number, τ snapshot); τ₀ is
    *                    delivered as pass 0
    */
  def decompose(h: Hypergraph, threads: Int = 1, notify: Boolean = true,
                order: Array[Int] = null,
                onIteration: (Int, Array[Int]) => Unit = null): IterResult = {
    val n = h.numR
    val tau = h.degrees
    if (onIteration != null) onIteration(0, tau.clone())
    val ord = if (order != null) order else Array.tabulate(n)(identity)
    require(ord.length == n, "order must be a permutation of 0..numR-1")
    val maxDeg = h.maxDegree
    val c: Array[Boolean] = if (notify) Array.fill(n)(true) else null
    val changed = new java.util.concurrent.atomic.AtomicBoolean(false)
    val computations = new java.util.concurrent.atomic.AtomicLong(0L)
    var iterations = 0
    var passes = 0
    var active = Vector.empty[Long]
    var go = n > 0
    while (go) {
      passes += 1
      changed.set(false)
      val activeBefore = computations.get()
      ParallelFor.dynamic(n, threads)(() => new HIndexScratch(maxDeg)) { (idx, scratch) =>
        val r = ord(idx)
        if (c == null || c(r)) {
          computations.incrementAndGet()
          var len = 0
          h.foreachIncident(r) { s =>
            var rho = Int.MaxValue
            h.foreachMember(s) { r2 => if (r2 != r && tau(r2) < rho) rho = tau(r2) }
            scratch.vals(len) = rho
            len += 1
          }
          val hv = scratch.hIndex(len)
          val old = tau(r)
          if (hv != old) {
            changed.set(true)
            if (c != null) {
              // Notify only neighbours whose τ lies in (hv, old]: anything
              // at or below hv already saw a value >= its own; anything
              // above old cannot have counted us at its h-index threshold.
              h.foreachIncident(r) { s =>
                h.foreachMember(s) { r2 =>
                  if (r2 != r && hv < tau(r2) && tau(r2) <= old) c(r2) = true
                }
              }
            }
            tau(r) = hv
          }
          if (c != null) c(r) = false
        }
      }
      val did = computations.get() - activeBefore
      active :+= did
      if (changed.get()) iterations += 1 else go = false
      if (onIteration != null) onIteration(passes, tau.clone())
    }
    IterResult(tau, iterations, passes, computations.get(), active)
  }
}
