package repro.metrics

/** Accuracy metric of §5.2: the fraction of r-cliques whose current τ index
  * already equals the converged κ_s index,
  * |{R : τ(R) = κ_s(R)}| / |R(G)|.
  */
object Accuracy {
  def of(tau: Array[Int], kappa: Array[Int]): Double = {
    require(tau.length == kappa.length)
    if (tau.isEmpty) return 1.0
    var eq = 0
    var i = 0
    while (i < tau.length) { if (tau(i) == kappa(i)) eq += 1; i += 1 }
    eq.toDouble / tau.length
  }
}
