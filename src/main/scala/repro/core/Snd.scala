package repro.core

/** Result of an iterative local decomposition run.
  *
  * @param kappa           converged κ_s indices
  * @param iterations      passes in which at least one τ changed
  * @param passes          total passes executed (iterations + the final
  *                        no-change pass that detects convergence)
  * @param tauComputations number of h-index evaluations performed (τ₀
  *                        initialization excluded)
  * @param activeTrace     per-pass count of r-cliques actually recomputed
  */
final case class IterResult(
    kappa: Array[Int],
    iterations: Int,
    passes: Int,
    tauComputations: Long,
    activeTrace: Vector[Long],
)

/** SND — Synchronous Nucleus Decomposition (Algorithm 2).
  *
  * Jacobi-style iteration of the update operator 𝒰 (Definition 5): every
  * pass computes all τ values from the previous pass's snapshot, so the
  * result and the iteration count are deterministic and independent of both
  * processing order and thread count.
  */
object Snd {

  /** Run SND to convergence.
    *
    * @param h           the (r,s) hypergraph
    * @param threads     parallel workers for each pass (1 = sequential)
    * @param onIteration optional observer called after every pass with
    *                    (pass number starting at 1, τ snapshot); the τ₀
    *                    snapshot is delivered as pass 0 before iterating
    */
  def decompose(h: Hypergraph, threads: Int = 1,
                onIteration: (Int, Array[Int]) => Unit = null): IterResult = {
    val n = h.numR
    val tau = h.degrees
    if (onIteration != null) onIteration(0, tau.clone())
    var tauP = new Array[Int](n)
    val maxDeg = h.maxDegree
    val changed = new java.util.concurrent.atomic.AtomicBoolean(false)
    var iterations = 0
    var passes = 0
    var tauComputations = 0L
    var active = Vector.empty[Long]
    var go = n > 0
    while (go) {
      passes += 1
      System.arraycopy(tau, 0, tauP, 0, n)
      changed.set(false)
      ParallelFor.dynamic(n, threads)(() => new HIndexScratch(maxDeg)) { (r, scratch) =>
        var len = 0
        h.foreachIncident(r) { s =>
          var rho = Int.MaxValue
          h.foreachMember(s) { r2 => if (r2 != r && tauP(r2) < rho) rho = tauP(r2) }
          scratch.vals(len) = rho
          len += 1
        }
        val hv = scratch.hIndex(len)
        if (hv != tauP(r)) changed.set(true)
        tau(r) = hv
      }
      tauComputations += n
      active :+= n.toLong
      if (changed.get()) iterations += 1 else go = false
      if (onIteration != null) onIteration(passes, tau.clone())
    }
    IterResult(tau, iterations, passes, tauComputations, active)
  }
}
