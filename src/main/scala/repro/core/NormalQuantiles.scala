package repro.core

/** Standard-normal quantiles — the fixed breakpoint source for iSAX, which
  * equi-depth bins the N(0,1) distribution (paper section IV-D).
  *
  * Uses Peter Acklam's rational approximation of the inverse normal CDF
  * (relative error < 1.15e-9), accurate far beyond what 8-bit symbol
  * boundaries require.
  */
object NormalQuantiles {

  /** Inverse CDF of N(0,1): returns z with P(Z <= z) = p, p in (0, 1). */
  def inverseCdf(p: Double): Double = {
    require(p > 0.0 && p < 1.0, s"p=$p out of (0,1)")
    // Coefficients for Acklam's algorithm.
    val a = Array(-3.969683028665376e+01, 2.209460984245205e+02, -2.759285104469687e+02,
                  1.383577518672690e+02, -3.066479806614716e+01, 2.506628277459239e+00)
    val b = Array(-5.447609879822406e+01, 1.615858368580409e+02, -1.556989798598866e+02,
                  6.680131188771972e+01, -1.328068155288572e+01)
    val c = Array(-7.784894002430293e-03, -3.223964580411365e-01, -2.400758277161838e+00,
                  -2.549732539343734e+00, 4.374664141464968e+00, 2.938163982698783e+00)
    val d = Array(7.784695709041462e-03, 3.224671290700398e-01, 2.445134137142996e+00,
                  3.754408661907416e+00)
    val pLow = 0.02425
    val pHigh = 1 - pLow
    if (p < pLow) {
      val q = math.sqrt(-2 * math.log(p))
      (((((c(0) * q + c(1)) * q + c(2)) * q + c(3)) * q + c(4)) * q + c(5)) /
        ((((d(0) * q + d(1)) * q + d(2)) * q + d(3)) * q + 1)
    } else if (p <= pHigh) {
      val q = p - 0.5
      val r = q * q
      (((((a(0) * r + a(1)) * r + a(2)) * r + a(3)) * r + a(4)) * r + a(5)) * q /
        (((((b(0) * r + b(1)) * r + b(2)) * r + b(3)) * r + b(4)) * r + 1)
    } else {
      val q = math.sqrt(-2 * math.log(1 - p))
      -(((((c(0) * q + c(1)) * q + c(2)) * q + c(3)) * q + c(4)) * q + c(5)) /
        ((((d(0) * q + d(1)) * q + d(2)) * q + d(3)) * q + 1)
    }
  }

  /** The alpha-1 interior breakpoints that equi-depth bin N(0,1) into `alpha`
    * bins: breakpoint i (0-based) is the (i+1)/alpha quantile. The implied
    * outer boundaries are -inf and +inf.
    */
  def breakpoints(alpha: Int): Array[Double] = {
    require(alpha >= 2, s"alphabet size must be >= 2, got $alpha")
    Array.tabulate(alpha - 1)(i => inverseCdf((i + 1).toDouble / alpha))
  }
}
