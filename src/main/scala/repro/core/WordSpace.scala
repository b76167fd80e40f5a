package repro.core

/** Query-side projection of a raw (z-normalized) series into the summarization
  * domain: PAA segment means for iSAX, selected DFT values for SFA.
  */
trait Projector extends Serializable {
  def project(x: Array[Float]): Array[Double]
}

/** PAA projector for iSAX (paper section IV-D). */
final class PaaProjector(val n: Int, val l: Int) extends Projector {
  override def project(x: Array[Float]): Array[Double] = Paa.transform(x, l)
}

/** DFT projector for SFA: partial DFT of the first `partial.m` coefficients,
  * then selection of the learned best real/imag value indices (paper IV-E2).
  * `bestIdx(j)` is a flat value index (2k = Re of coefficient k, 2k+1 = Im).
  */
final class DftProjector(val partial: Dft.Partial, val bestIdx: Array[Int]) extends Projector {
  override def project(x: Array[Float]): Array[Double] = {
    val all = partial.transform(x)
    val out = new Array[Double](bestIdx.length)
    var j = 0
    while (j < bestIdx.length) { out(j) = all(bestIdx(j)); j += 1 }
    out
  }
}

/** A quantized word space: the common abstraction behind iSAX and SFA that the
  * MESSI-style tree index is generic over.
  *
  * Every dimension `j` has a monotone interior breakpoint table
  * `breakpoints(j)` of size `alpha - 1` (outer boundaries are implicitly
  * +/- infinity), a lower-bound weight `weights(j)` (segment length for iSAX,
  * Parseval weight for SFA), and the projector maps raw series into the
  * summarization domain. A full-cardinality symbol is the bin index of the
  * projected value; a node in the tree holds a `bits(j)`-bit *prefix* of each
  * symbol, denoting the union of the 2^(maxBits - bits) adjacent bins — this
  * works because alpha is a power of two and both equi-depth and equi-width
  * (and the N(0,1)) binnings merge dyadically.
  */
final class QuantizedWordSpace(
    val name: String,
    val n: Int,
    val l: Int,
    val alpha: Int,
    val breakpoints: Array[Array[Double]],
    val weights: Array[Double],
    val projector: Projector,
) extends Serializable {
  require(alpha >= 2 && (alpha & (alpha - 1)) == 0, s"alpha must be a power of two, got $alpha")
  require(breakpoints.length == l && weights.length == l,
          s"need $l breakpoint tables and weights")
  breakpoints.foreach(bp => require(bp.length == alpha - 1, s"need ${alpha - 1} interior breakpoints"))

  /** Bits per symbol at full cardinality. */
  val maxBits: Int = Integer.numberOfTrailingZeros(alpha)

  def project(x: Array[Float]): Array[Double] = projector.project(x)

  /** Symbol of value `v` in dimension `j`: the number of breakpoints <= v
    * (bins are half-open [bp(a-1), bp(a))). Implemented as an upper-bound
    * binary search so duplicate breakpoints — possible when a small MCB sample
    * yields degenerate quantiles — still quantize consistently.
    */
  def symbolOf(j: Int, v: Double): Int = {
    val bp = breakpoints(j)
    var lo = 0
    var hi = bp.length // first index with bp(idx) > v, searched in [lo, hi]
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (bp(mid) <= v) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Quantize a projected vector into a full-cardinality word. */
  def quantize(vals: Array[Double]): Array[Int] = {
    val w = new Array[Int](l)
    var j = 0
    while (j < l) { w(j) = symbolOf(j, vals(j)); j += 1 }
    w
  }

  /** Full-cardinality word of a raw (z-normalized) series. */
  def word(x: Array[Float]): Array[Int] = quantize(project(x))

  /** Lower edge of the bin range [sLo, sHi] in dimension j (-inf for sLo=0). */
  private def loEdge(j: Int, sLo: Int): Double =
    if (sLo == 0) Double.NegativeInfinity else breakpoints(j)(sLo - 1)

  /** Upper edge of the bin range [sLo, sHi] in dimension j (+inf for sHi=alpha-1). */
  private def hiEdge(j: Int, sHi: Int): Double =
    if (sHi == alpha - 1) Double.PositiveInfinity else breakpoints(j)(sHi)

  /** Per-series squared LBD: query projection vs a full-cardinality word,
    * early-abandoning against bsfSq. This is the allocation-free hot-path form
    * of the paper's SIMD kernel (Alg. 3): branchless-style lane math in chunks
    * of `SimdLbd.ChunkSize`, early abandoning only at chunk boundaries.
    * `wordLbSqRef` pins the semantics via the generic kernel.
    */
  def wordLbSq(qp: Array[Double], w: Array[Int], bsfSq: Double): Double = {
    var acc = 0.0
    var j = 0
    while (j < l) {
      val chunkEnd = math.min(j + SimdLbd.ChunkSize, l)
      while (j < chunkEnd) {
        val bp = breakpoints(j)
        val s = w(j)
        val v = qp(j)
        var d = 0.0
        if (s > 0 && v < bp(s - 1)) d = bp(s - 1) - v
        else if (s < alpha - 1 && v > bp(s)) d = v - bp(s)
        acc += weights(j) * d * d
        j += 1
      }
      if (acc > bsfSq) return acc
    }
    acc
  }

  /** Reference implementation of `wordLbSq` through the generic SIMD kernel —
    * kept for the equivalence tests.
    */
  def wordLbSqRef(qp: Array[Double], w: Array[Int], bsfSq: Double): Double = {
    val lo = new Array[Double](l)
    val hi = new Array[Double](l)
    var j = 0
    while (j < l) { lo(j) = loEdge(j, w(j)); hi(j) = hiEdge(j, w(j)); j += 1 }
    SimdLbd.minDistSq(qp, lo, hi, weights, bsfSq)
  }

  /** Node-level squared LBD: query projection vs per-dimension bit prefixes.
    * `prefix(j)` is a `bits(j)`-bit prefix of the 8-bit symbol; bits(j) may be
    * 0 (dimension entirely unconstrained). Allocation-free.
    */
  def nodeLbSq(qp: Array[Double], prefix: Array[Int], bits: Array[Int]): Double = {
    var acc = 0.0
    var j = 0
    while (j < l) {
      val span = maxBits - bits(j)
      val sLo = prefix(j) << span
      val sHi = ((prefix(j) + 1) << span) - 1
      val bp = breakpoints(j)
      val v = qp(j)
      var d = 0.0
      if (sLo > 0 && v < bp(sLo - 1)) d = bp(sLo - 1) - v
      else if (sHi < alpha - 1 && v > bp(sHi)) d = v - bp(sHi)
      acc += weights(j) * d * d
      j += 1
    }
    acc
  }

  /** Reference implementation of `nodeLbSq` through the generic kernel. */
  def nodeLbSqRef(qp: Array[Double], prefix: Array[Int], bits: Array[Int]): Double = {
    val lo = new Array[Double](l)
    val hi = new Array[Double](l)
    var j = 0
    while (j < l) {
      val span = maxBits - bits(j)
      val sLo = prefix(j) << span
      val sHi = ((prefix(j) + 1) << span) - 1
      lo(j) = loEdge(j, sLo)
      hi(j) = hiEdge(j, sHi)
      j += 1
    }
    SimdLbd.minDistSq(qp, lo, hi, weights, Double.PositiveInfinity)
  }

  /** Squared lower bound of the plain projection distance (no quantization):
    * sum_j w_j (qp_j - cp_j)^2. For SFA this is the DFT lower bound (Eq. 1);
    * for iSAX it is the PAA lower bound. Used by tests and the TLB ablation.
    */
  def projLbSq(qp: Array[Double], cp: Array[Double]): Double = {
    var acc = 0.0
    var j = 0
    while (j < l) { val d = qp(j) - cp(j); acc += weights(j) * d * d; j += 1 }
    acc
  }
}
