package repro.core

/** TRIM-B — batched TRIM (Algorithm 3).
  *
  * Generalizes TRIM to pick a size-b batch per round via greedy maximum
  * coverage over the mRR-sets (guarantee ρ_b = 1 − (1 − 1/b)^b). Differences
  * from Algorithm 2, mirrored here: θ_max/θ_o involve ρ_b and b (Lines 2–3),
  * a₁ uses ln C(n_i, b) candidates, the optimum's coverage upper bound
  * divides the greedy coverage by ρ_b (Line 10), and the stop ratio is
  * ρ_b(1 − ε̂) (Line 11). With b = 1 this degenerates to TRIM.
  */
object TrimB {

  /** ρ_b = 1 − (1 − 1/b)^b. */
  def rho(b: Int): Double = 1.0 - math.pow(1.0 - 1.0 / b, b)

  /** ln C(n, b) without overflow: Σ_{i=1..b} ln((n−b+i)/i). */
  def lnChoose(n: Int, b: Int): Double = {
    require(b >= 0 && b <= n, s"C($n, $b) undefined")
    var s = 0.0
    var i = 1
    while (i <= b) { s += math.log((n - b + i).toDouble / i); i += 1 }
    s
  }

  /** Select a batch of (up to) `b` seeds from the residual graph behind `ctx`. */
  def select(ctx: MRRSamplerCtx, eps: Double, b: Int): SelectResult = {
    val nI = ctx.nI
    val bEff = math.min(b, nI)
    val rhoB = rho(bEff)
    val sch = Trim.schedule(nI, ctx.etaI, eps, lnChoose(nI, bEff), rhoB, bEff)

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
      val (batch, covered) = Coverage.greedyCover(ctx.inactive.length, sets.toIndexedSeq, bEff)
      val lamL = Trim.lamLower(covered, sch.a1)
      val lamU = Trim.lamUpper(covered / rhoB, sch.a2)
      if ((lamU > 0 && lamL / lamU >= rhoB * (1.0 - sch.epsHat)) || t == sch.T) {
        val est = ctx.etaI.toDouble * covered / generated
        return SelectResult(batch, est, ctx.totalSamples, ctx.totalWork, t)
      }
      t += 1
      grow(math.min(generated * 2, math.ceil(sch.thetaMax).toLong))
    }
    throw new IllegalStateException("unreachable")
  }
}
