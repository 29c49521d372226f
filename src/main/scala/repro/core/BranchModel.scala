package repro.core

import Combinatorics._

/** Parameters of the Section-5 probabilistic model for one graph pair.
  *
  * @param v             `|V₁'|` — vertex count of the extended graphs, i.e.
  *                      `max(|V_Q|, |V_G|)` for the pair under comparison.
  * @param nVertexLabels `|L_V|`, size of the vertex-label alphabet.
  * @param nEdgeLabels   `|L_E|`, size of the edge-label alphabet.
  */
final case class ModelParams(v: Long, nVertexLabels: Int, nEdgeLabels: Int) extends Serializable {
  require(v >= 1, s"need at least one vertex, got $v")
  require(nVertexLabels >= 1 && nEdgeLabels >= 1, "label alphabets must be non-empty")

  /** Number of edge slots of the complete extended graph G₁' = C(v,2). */
  val e: Double = v.toDouble * (v - 1) / 2.0

  /** log D, Eq. (13): D = |L_V| · C(v + |L_E| − 1, |L_E|), the number of
    * possible branch types. (Eq. 13 — not the Lemma-3 prose variant — is
    * what reproduces the paper's Example 6 numbers; see DESIGN.md §4.)
    */
  val logD: Double = math.log(nVertexLabels.toDouble) +
    logBinom(v.toDouble + nEdgeLabels - 1, nEdgeLabels.toDouble)

  /** log(D − 1), computed stably even when D overflows a Double. */
  val logDm1: Double = {
    val d = math.exp(logD)
    if (d.isInfinite || d > 1e15) logD + math.log1p(-math.exp(-logD))
    else if (d <= 1.0) Double.NegativeInfinity
    else math.log(d - 1)
  }
}

/** Closed forms of Theorem 3: `Λ₁(τ,φ) = Pr[GBD = φ | GED = τ]` over the
  * extended graph pair, decomposed as Ω₁..Ω₄ (Lemmas 1–4), plus the exact
  * τ-derivatives needed by the Jeffreys prior (Section 5.2.2).
  */
object BranchModel {

  /** Ω₁(x,τ) = Pr[X=x | GED=τ] = H(x; v + C(v,2), v, τ) — Lemma 1:
    * probability that a random minimal edit sequence relabels exactly `x`
    * vertices (and τ−x edges).
    */
  def omega1(x: Int, tau: Int, p: ModelParams): Double =
    hyper(x.toDouble, p.v + p.e, p.v.toDouble, tau.toDouble)

  /** Ω₂(m,x,τ) = Pr[Z=m | Y=τ−x] — Lemma 2: probability that τ−x randomly
    * chosen distinct edges of the complete extended graph cover exactly `m`
    * vertices. Inclusion–exclusion inner sum is evaluated in linear space
    * (magnitudes are bounded for m ≤ 2τ̂; see DESIGN.md §5), then scaled by
    * exp(logC(v,m) − logC(E,τ−x)).
    */
  def omega2(m: Int, x: Int, tau: Int, p: ModelParams): Double = {
    val xp = tau - x
    if (xp < 0) return 0.0
    if (xp == 0) return if (m == 0) 1.0 else 0.0
    if (m < 0 || m > p.v || m > 2L * xp) return 0.0
    var inner = 0.0
    var t = 0
    while (t <= m) {
      val ct2 = t.toDouble * (t - 1) / 2
      val term = binom(m.toDouble, t.toDouble) * binom(ct2, xp.toDouble)
      if (term != 0.0) inner += (if (((m - t) & 1) == 1) -term else term)
      t += 1
    }
    if (inner <= 0) 0.0
    else {
      val scale = logBinom(p.v.toDouble, m.toDouble) - logBinom(p.e, xp.toDouble)
      math.exp(math.log(inner) + scale)
    }
  }

  /** Ω₃(r,φ) = Pr[GBD=φ | R=r] = C(r, r−φ)·(D−1)^φ / D^r — Lemma 3: of the
    * `r` relabelled branches, exactly φ end up different from the originals.
    */
  def omega3(r: Int, phi: Int, p: ModelParams): Double = {
    if (phi < 0 || phi > r) 0.0
    else {
      val lb = logBinom(r.toDouble, (r - phi).toDouble)
      if (phi == 0) math.exp(lb - r * p.logD) // avoid 0·(−∞) when D=1
      else math.exp(lb + phi * p.logDm1 - r * p.logD)
    }
  }

  /** Ω₄(x,r,m) = Pr[R=r | X=x, Z=m] = H(x+m−r; v, m, x) — Lemma 4:
    * overlap between the x relabelled vertices and the m edge-covered ones.
    */
  def omega4(x: Int, r: Int, m: Int, p: ModelParams): Double =
    hyper((x + m - r).toDouble, p.v.toDouble, m.toDouble, x.toDouble)

  /** Λ₁(τ,φ) = Pr[GBD=φ | GED=τ], Eq. (7) of Theorem 3.
    *
    * Summation ranges follow Section 6.2: x ∈ [0,τ], m ∈ [0, min(2(τ−x), v)],
    * r ∈ [max(x,m), min(x+m, v)]. Zero when φ > 3τ (r ≤ 3τ and Ω₃ = 0 for
    * φ > r), which the online stage exploits to short-circuit.
    */
  def lambda1(tau: Int, phi: Int, p: ModelParams): Double = {
    require(tau >= 0 && phi >= 0, s"tau=$tau phi=$phi must be non-negative")
    if (tau == 0) return if (phi == 0) 1.0 else 0.0
    if (phi > 3L * tau) return 0.0
    var acc = 0.0
    val xMax = math.min(tau.toLong, p.v).toInt
    var x = 0
    while (x <= xMax) {
      val o1 = omega1(x, tau, p)
      if (o1 > 0) {
        val xp = tau - x
        val mMax = math.min(2L * xp, p.v).toInt
        var accX = 0.0
        var m = 0
        while (m <= mMax) {
          val o2 = omega2(m, x, tau, p)
          if (o2 > 0) {
            val rMax = math.min((x + m).toLong, p.v).toInt
            var accM = 0.0
            var r = math.max(x, m)
            while (r <= rMax) {
              accM += omega3(r, phi, p) * omega4(x, r, m, p)
              r += 1
            }
            accX += o2 * accM
          }
          m += 1
        }
        acc += o1 * accX
      }
      x += 1
    }
    acc
  }

  /** Γ-continuation of Ω₁ to real τ (used to cross-check the derivative).
    * Intentionally unclamped: at support boundaries (e.g. τ−x=0) the smooth
    * continuation is what the analytic digamma derivative differentiates.
    */
  private[core] def omega1Cont(x: Int, tau: Double, p: ModelParams): Double = {
    val l = logBinom(p.v.toDouble, x.toDouble) + logBinomCont(p.e, tau - x) -
      logBinomCont(p.v + p.e, tau)
    if (l == Double.NegativeInfinity || l.isNaN) 0.0 else math.exp(l)
  }

  /** dΩ₁/dτ — exact derivative of the Γ-continued Lemma-1 form:
    * Ω₁·[ψ(τ+1) − ψ(τ−x+1) + ψ(E−τ+x+1) − ψ(v+E−τ+1)].
    */
  def dOmega1(x: Int, tau: Int, p: ModelParams): Double = {
    val o1 = omega1(x, tau, p)
    if (o1 == 0.0) 0.0
    else {
      val xp = tau - x
      val g = digamma(tau + 1.0) - digamma(xp + 1.0) +
        digamma(p.e - xp + 1.0) - digamma(p.v + p.e - tau + 1.0)
      o1 * g
    }
  }

  /** dΩ₂/dτ — per-term exact derivative of the Γ-continued Lemma-2 form.
    * Each surviving inclusion–exclusion term is weighted by
    * ψ(C(t,2)−(τ−x)+1) − ψ(E−(τ−x)+1); terms with empty support are dropped,
    * matching the convention of the paper's Eq. (19).
    */
  def dOmega2(m: Int, x: Int, tau: Int, p: ModelParams): Double = {
    val xp = tau - x
    if (xp < 0 || m < 0 || m > p.v || m > 2L * math.max(xp, 0)) return 0.0
    var inner = 0.0
    var any = false
    var t = 0
    while (t <= m) {
      val ct2 = t.toDouble * (t - 1) / 2
      val b = binom(m.toDouble, t.toDouble) * binom(ct2, xp.toDouble)
      if (b != 0.0) {
        val w = digamma(ct2 - xp + 1.0) - digamma(p.e - xp + 1.0)
        inner += (if (((m - t) & 1) == 1) -b * w else b * w)
        any = true
      }
      t += 1
    }
    if (!any) 0.0
    else inner * math.exp(logBinom(p.v.toDouble, m.toDouble) - logBinom(p.e, xp.toDouble))
  }

  /** d/dτ log Λ₁(τ,φ), Eq. (17): both Ω₁ and Ω₂ differentiated analytically.
    * Returns 0 where Λ₁ vanishes (those φ contribute nothing to Eq. 16).
    */
  def dLogLambda1(tau: Int, phi: Int, p: ModelParams): Double = {
    val l1 = lambda1(tau, phi, p)
    if (l1 <= 0) return 0.0
    var num = 0.0
    val xMax = math.min(tau.toLong, p.v).toInt
    var x = 0
    while (x <= xMax) {
      val o1 = omega1(x, tau, p)
      val d1 = dOmega1(x, tau, p)
      val xp = tau - x
      val mMax = math.min(2L * math.max(xp, 0), p.v).toInt
      var sumO2 = 0.0
      var sumD2 = 0.0
      var m = 0
      while (m <= mMax) {
        val rMax = math.min((x + m).toLong, p.v).toInt
        var inner3 = 0.0
        var r = math.max(x, m)
        while (r <= rMax) {
          inner3 += omega3(r, phi, p) * omega4(x, r, m, p)
          r += 1
        }
        if (inner3 != 0.0) {
          sumO2 += omega2(m, x, tau, p) * inner3
          sumD2 += dOmega2(m, x, tau, p) * inner3
        }
        m += 1
      }
      num += d1 * sumO2 + o1 * sumD2
      x += 1
    }
    num / l1
  }
}
