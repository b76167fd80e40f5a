package repro.core

/** iSAX — the *static* symbolic summarization used by MESSI (paper IV-D):
  * PAA segment means quantized with fixed breakpoints that equi-depth bin the
  * standard Normal distribution. All dimensions share one breakpoint table.
  *
  * The lower bound is the classic iSAX MINDIST: per-segment distance of the
  * query's PAA value to the symbol's interval, weighted by the segment length
  * (which generalizes the usual sqrt(n/l) factor to non-divisible lengths).
  */
object Isax {

  /** Build the iSAX word space for series length `n`, word length `l` and
    * alphabet size `alpha` (a power of two, 256 in the paper).
    */
  def space(n: Int, l: Int, alpha: Int): QuantizedWordSpace = {
    val bp = NormalQuantiles.breakpoints(alpha)
    val weights = Paa.segmentLengths(n, l).map(_.toDouble)
    new QuantizedWordSpace(
      name = s"iSAX(n=$n,l=$l,a=$alpha)",
      n = n, l = l, alpha = alpha,
      breakpoints = Array.fill(l)(bp),
      weights = weights,
      projector = new PaaProjector(n, l),
    )
  }
}
