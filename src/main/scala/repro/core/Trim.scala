package repro.core

/** Outcome of one round of seed selection. `estTruncated` is the estimated
  * expected (truncated, for TRIM) spread of the returned seeds; `samples` and
  * `work` instrument the efficiency claims (Lemmas 3.8–3.10).
  */
final case class SelectResult(
    seeds: Array[Int],
    estTruncated: Double,
    samples: Long,
    work: Long,
    iterations: Int
)

/** TRIM — TRuncated Influence Maximization (Algorithm 2).
  *
  * OPIM-C-style single-group design: start from θ_o mRR-sets, pick the node
  * v* with maximum coverage, bound its expected coverage from below (Λˡ, via
  * the martingale bound of Lemma A.2) and the optimum's from above (Λᵘ), and
  * stop when Λˡ(v*)/Λᵘ(v°) ≥ 1−ε̂, doubling the sample pool otherwise. At
  * most T iterations; the T-th returns unconditionally (the θ_max budget of
  * Line 2 then guarantees the bound by [40]).
  */
object Trim {

  /** Lemma A.2 lower bound on E[Λ] given observed coverage and confidence a. */
  def lamLower(cov: Double, a: Double): Double = {
    val s = math.sqrt(cov + 2.0 * a / 9.0) - math.sqrt(a / 2.0)
    s * s - a / 18.0
  }

  /** Lemma A.2 upper bound on E[Λ] given observed coverage and confidence a. */
  def lamUpper(cov: Double, a: Double): Double = {
    val s = math.sqrt(cov + a / 2.0) + math.sqrt(a / 2.0)
    s * s
  }

  private val OneMinusInvE = 1.0 - 1.0 / math.E

  /** Parameters of Lines 1–5 shared by TRIM and the AdaptIM skeleton.
    * `target` is η_i for truncated estimation, n_i for vanilla RR estimation.
    */
  final case class Schedule(delta: Double, epsHat: Double, thetaMax: Double,
                            thetaO: Double, T: Int, a1: Double, a2: Double)

  def schedule(nI: Int, target: Int, eps: Double, lnCandidates: Double,
               rhoB: Double = 1.0, b: Int = 1): Schedule = {
    val delta = eps / (100.0 * OneMinusInvE * (1.0 - eps) * target)
    val epsHat = 99.0 * eps / (100.0 - eps)
    val ln6d = math.log(6.0 / delta)
    val sq = math.sqrt(ln6d) + math.sqrt((lnCandidates + ln6d) / rhoB)
    val thetaMax = 2.0 * nI * sq * sq / (b * epsHat * epsHat)
    val thetaO = math.max(1.0, thetaMax * b * epsHat * epsHat / nI)
    val T = math.ceil(math.log(thetaMax / thetaO) / math.log(2.0)).toInt + 1
    val lnT = math.log(3.0 * T / delta)
    Schedule(delta, epsHat, thetaMax, thetaO, T, lnT + lnCandidates, lnT)
  }

  /** Select one seed node from the residual graph behind `ctx`.
    *
    * With a truncated-estimator context (randomized multi-roots) this is
    * Algorithm 2 verbatim; with `vanillaRoots` and `target = n_i` it is the
    * OPIM-C-style vanilla-spread selector used by the AdaptIM baseline.
    */
  def select(ctx: MRRSamplerCtx, eps: Double): SelectResult = {
    val nI = ctx.nI
    val target = if (ctx.vanillaRoots) nI else ctx.etaI
    val sch = schedule(nI, target, eps, math.log(nI.toDouble))

    val sets = scala.collection.mutable.ArrayBuffer.empty[Array[Int]]
    var generated = 0L
    def grow(upTo: Long): Unit = {
      val need = (upTo - generated).toInt
      if (need > 0) {
        sets ++= ctx.generate(generated, need)
        generated += need
      }
    }
    grow(math.ceil(sch.thetaO).toLong)

    var t = 1
    while (true) {
      // Count over the dense node-id space; active nodes never appear in a
      // residual mRR-set, so their coverage stays 0.
      val cov = Coverage.counts(ctx.inactive.length, sets)
      val (vStar, c) = Coverage.topNode(cov, ctx.inactive)
      val lamL = lamLower(c, sch.a1)
      val lamU = lamUpper(c, sch.a2)
      if ((lamU > 0 && lamL / lamU >= 1.0 - sch.epsHat) || t == sch.T) {
        val est = target.toDouble * c / generated
        return SelectResult(Array(vStar), est, ctx.totalSamples, ctx.totalWork, t)
      }
      t += 1
      grow(math.min(generated * 2, math.ceil(sch.thetaMax).toLong))
    }
    throw new IllegalStateException("unreachable")
  }
}
