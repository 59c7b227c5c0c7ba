package repro.lanns

/** Per-shard topK reduction (§5.3.2): under random sharding each shard
  * holds ≈1/S of any query's true top-K, so fetching the full K from every
  * shard wastes network and merge cost. The cutoff is the upper end of the
  * Normal Approximation Interval (Brown–Cai–DasGupta) for a binomial
  * proportion s' = 1/S over topK trials:
  *
  *   cI = s' + f(p)·sqrt(s'(1−s')/topK),  perShardTopK = min(topK, ⌈cI·topK⌉)
  *
  * The paper states f(p) is "the (1 − p/2) quantile of the standard normal"
  * with p the confidence; read literally (p = 0.95 → z ≈ 0.06) the interval
  * collapses to s', which contradicts the cited interval. We implement the
  * standard two-sided z, f(p) = Φ⁻¹((1 + p)/2) (0.95 → 1.96), which is what
  * the Normal Approximation Interval prescribes.
  */
object PerShardTopK {

  /** Inverse standard-normal CDF (Acklam's rational approximation,
    * |ε| < 1.15e−9 on (0, 1)).
    */
  def probit(p: Double): Double = {
    require(p > 0.0 && p < 1.0, s"probit defined on (0,1), got $p")
    val a = Array(-3.969683028665376e+01, 2.209460984245205e+02, -2.759285104469687e+02,
                   1.383577518672690e+02, -3.066479806614716e+01, 2.506628277459239e+00)
    val b = Array(-5.447609879822406e+01, 1.615858368580409e+02, -1.556989798598866e+02,
                   6.680131188771972e+01, -1.328068155288572e+01)
    val c = Array(-7.784894002430293e-03, -3.223964580411365e-01, -2.400758277161838e+00,
                  -2.549732539343734e+00, 4.374664141464968e+00, 2.938163982698783e+00)
    val d = Array(7.784695709041462e-03, 3.224671290700398e-01, 2.445134137142996e+00,
                  3.754408661907416e+00)
    val pLow = 0.02425
    if (p < pLow) {
      val q = math.sqrt(-2 * math.log(p))
      (((((c(0) * q + c(1)) * q + c(2)) * q + c(3)) * q + c(4)) * q + c(5)) /
        ((((d(0) * q + d(1)) * q + d(2)) * q + d(3)) * q + 1)
    } else if (p <= 1 - pLow) {
      val q = p - 0.5
      val r = q * q
      (((((a(0) * r + a(1)) * r + a(2)) * r + a(3)) * r + a(4)) * r + a(5)) * q /
        (((((b(0) * r + b(1)) * r + b(2)) * r + b(3)) * r + b(4)) * r + 1)
    } else {
      -probit(1 - p)
    }
  }

  /** The reduced k each shard is asked for. Segments inherit the shard's
    * value unchanged (§5.3.2: no per-segment topK, or fewer than topK
    * results could survive the merge).
    */
  def apply(topK: Int, numShards: Int, confidence: Double): Int = {
    require(topK >= 1, s"topK must be >= 1, got $topK")
    require(confidence > 0.0 && confidence < 1.0, s"confidence in (0,1), got $confidence")
    if (numShards <= 1) topK
    else {
      val sPrime = 1.0 / numShards
      val z = probit((1.0 + confidence) / 2.0)
      val cI = sPrime + z * math.sqrt(sPrime * (1.0 - sPrime) / topK)
      math.min(topK, math.ceil(cI * topK).toInt).max(1)
    }
  }
}
