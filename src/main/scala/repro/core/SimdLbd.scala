package repro.core

/** The paper's SIMD lower-bound kernel (Algorithm 3, Figure 6), transcribed to
  * the JVM.
  *
  * Substitution note (see DESIGN.md §5): the original uses AVX/AVX2 intrinsics.
  * Java 17 has no stable vector API, so this kernel reproduces Algorithm 3's
  * *control structure* instead of its instruction set:
  *
  *  - *conditional branching* is eliminated per lane by computing all three
  *    branch results (UPPER / LOWER / ZERO of Eq. 2) as
  *    `max(0, lower - v, v - upper)` — the scalar equivalent of computing the
  *    three masked branches and OR-ing them together;
  *  - *early abandoning* happens between chunks of 8 lanes (one 256-bit AVX
  *    vector of floats), never inside a chunk, exactly as in lines 2–14.
  *
  * The kernel returns a value `>= bsfSq` as soon as a chunk boundary proves the
  * candidate prunable; if the returned value is `< bsfSq` it is the exact
  * (squared, weighted) lower-bound distance.
  */
object SimdLbd {

  /** Lanes per chunk: a 256-bit vector of 32-bit floats. */
  val ChunkSize = 8

  /** Weighted squared mindist between a query projection `qp` and a box given
    * by per-dimension `[lo, hi]` bounds, early-abandoning against `bsfSq`.
    *
    * Per lane: d = max(0, lo_i - qp_i, qp_i - hi_i); contribution w_i * d^2.
    */
  def minDistSq(qp: Array[Double], lo: Array[Double], hi: Array[Double],
                weights: Array[Double], bsfSq: Double): Double = {
    val l = qp.length
    var acc = 0.0
    var i = 0
    while (i < l) {
      val end = math.min(i + ChunkSize, l)
      // one "vector": branchless lanes
      while (i < end) {
        val v = qp(i)
        val below = lo(i) - v   // > 0 iff v is LOWER than the box
        val above = v - hi(i)   // > 0 iff v is UPPER than the box
        var d = if (below > above) below else above
        if (d < 0) d = 0.0      // ZERO branch: inside the box
        acc += weights(i) * d * d
        i += 1
      }
      if (acc > bsfSq) return acc // early abandoning at chunk boundary
    }
    acc
  }

  /** Reference scalar implementation (explicit branches of Eq. 2), no early
    * abandoning — used by tests to pin the kernel's semantics.
    */
  def minDistSqReference(qp: Array[Double], lo: Array[Double], hi: Array[Double],
                         weights: Array[Double]): Double = {
    var acc = 0.0
    var i = 0
    while (i < qp.length) {
      val v = qp(i)
      val d =
        if (v < lo(i)) lo(i) - v
        else if (v > hi(i)) v - hi(i)
        else 0.0
      acc += weights(i) * d * d
      i += 1
    }
    acc
  }
}
