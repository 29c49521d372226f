package repro.core

/** Jeffreys (non-informative) prior of GEDs, Section 5.2.2.
  *
  * `Pr[GED=τ] ∝ sqrt( Σ_φ Λ₁(τ,φ) · (d/dτ log Λ₁(τ,φ))² )` (Eq. 16), with
  * φ ranging over {0,…,2τ̂} (one edit operation changes at most two branches)
  * and τ over {0,…,τ̂}. Per the paper, the value depends only on τ and
  * `v = |V₁'|`, so it is tabulated per distinct v — `F(τ, |V₁'|)`, Eq. (24).
  */
object JeffreysPrior {

  /** Unnormalized sqrt-Fisher-information values for τ ∈ [0, τ̂]. */
  private[core] def raw(v: Long, tauHat: Int, nVertexLabels: Int, nEdgeLabels: Int): Array[Double] = {
    val p = ModelParams(v, nVertexLabels, nEdgeLabels)
    Array.tabulate(tauHat + 1) { tau =>
      var s = 0.0
      var phi = 0
      val phiMax = 2 * tauHat
      while (phi <= phiMax) {
        val l1 = BranchModel.lambda1(tau, phi, p)
        if (l1 > 0) {
          val d = BranchModel.dLogLambda1(tau, phi, p)
          s += l1 * d * d
        }
        phi += 1
      }
      math.sqrt(s)
    }
  }

  /** `F(τ, v)` for all τ ∈ [0, τ̂], normalized so the entries sum to 1.
    * Falls back to the uniform distribution if the information degenerates.
    */
  def forV(v: Long, tauHat: Int, nVertexLabels: Int, nEdgeLabels: Int): Array[Double] = {
    val r = raw(v, tauHat, nVertexLabels, nEdgeLabels)
    val z = r.sum
    if (z <= 0 || z.isNaN || z.isInfinite) Array.fill(tauHat + 1)(1.0 / (tauHat + 1))
    else r.map(_ / z)
  }

  /** Tabulate `F(τ, v)` for a set of extended sizes (the Step-1* matrix). */
  def table(vs: Seq[Long], tauHat: Int, nVertexLabels: Int, nEdgeLabels: Int): Map[Long, Array[Double]] =
    vs.distinct.map(v => v -> forV(v, tauHat, nVertexLabels, nEdgeLabels)).toMap
}
