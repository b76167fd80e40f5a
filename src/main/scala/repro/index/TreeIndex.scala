package repro.index

import repro.core.{QuantizedWordSpace, Series}

import scala.collection.mutable

/** A MESSI-style in-memory tree index (paper IV-A..IV-C), generic over the
  * word space — instantiated with iSAX it is the MESSI index, with SFA it is
  * SOFA's index.
  *
  * Structure (paper IV-B):
  *  - the *root* hashes 1-bit-per-dimension words to subtrees (up to 2^l
  *    children; only populated ones exist);
  *  - *inner* nodes have two children obtained by raising the cardinality of
  *    one dimension by one bit;
  *  - *leaves* store up to `leafCapacity` (series-ref, word) entries; a full
  *    leaf splits on the dimension whose next bit distributes its entries most
  *    evenly (the balanced-split heuristic of iSAX2.0/MESSI).
  *
  * Query answering (paper IV-C) is the GEMINI exact algorithm: an approximate
  * descent seeds the best-so-far (BSF), then leaves are processed from a
  * priority queue ordered by node-level lower-bound distance; per-series
  * word-level LBDs (the SIMD kernel) and early-abandoning real distances prune
  * the rest. All distances are squared internally.
  *
  * One instance indexes one Spark partition's series; instances are built
  * single-threaded inside `mapPartitions` and are immutable after build.
  */
final class TreeIndex private (
    val space: QuantizedWordSpace,
    val leafCapacity: Int,
    val rootBits: Int,
) extends Serializable {
  require(rootBits >= 0 && rootBits <= space.maxBits, s"rootBits=$rootBits out of range")
  require(rootBits.toLong * space.l <= 62, "root key must fit in a Long")

  /** Raw z-normalized series and their external ids, positionally aligned. */
  private val data  = mutable.ArrayBuffer.empty[Array[Float]]
  private val ids   = mutable.ArrayBuffer.empty[Long]
  private val words = mutable.ArrayBuffer.empty[Array[Int]]

  sealed trait Node extends Serializable {
    def prefix: Array[Int]
    def bits: Array[Int]
  }
  final class Inner(val prefix: Array[Int], val bits: Array[Int], val splitDim: Int,
                    var left: Node, var right: Node) extends Node
  final class Leaf(val prefix: Array[Int], val bits: Array[Int]) extends Node {
    val entries = mutable.ArrayBuffer.empty[Int] // indices into data/ids/words
  }

  /** Root children keyed by the packed 1-bit word (bit j = top bit of symbol j). */
  val root = mutable.LongMap.empty[Node]

  def size: Int = data.length

  /** Root-child key: the top `rootBits` bits of every symbol, packed. With
    * rootBits = 0 (the laptop-scale default, see DESIGN.md §5) there is a
    * single root child and the tree is driven purely by capacity splits; with
    * rootBits = 1 this is MESSI's hashed root of up-to-2^l children.
    */
  private def topBitKey(w: Array[Int]): Long = {
    if (rootBits == 0) return 0L
    var key = 0L
    var j = 0
    while (j < w.length) {
      key |= ((w(j) >>> (space.maxBits - rootBits)).toLong & ((1L << rootBits) - 1)) << (j * rootBits)
      j += 1
    }
    key
  }

  /** Bit of symbol `sym` at depth `depth` (0 = most significant of maxBits). */
  private def bitAt(sym: Int, depth: Int): Int =
    (sym >>> (space.maxBits - 1 - depth)) & 1

  /** Insert one (already z-normalized) series. Build-time only. */
  def insert(id: Long, z: Array[Float]): Unit = {
    val idx = data.length
    data += z
    ids += id
    val w = space.word(z)
    words += w
    val key = topBitKey(w)
    root.get(key) match {
      case None =>
        val prefix = Array.tabulate(space.l)(j => w(j) >>> (space.maxBits - rootBits))
        val leaf = new Leaf(prefix, Array.fill(space.l)(rootBits))
        leaf.entries += idx
        root.update(key, leaf)
      case Some(node) =>
        val replacement = insertInto(node, idx, w)
        if (replacement ne node) root.update(key, replacement)
    }
  }

  /** Insert into a subtree; returns the (possibly new) subtree root. */
  private def insertInto(node: Node, idx: Int, w: Array[Int]): Node = node match {
    case inner: Inner =>
      val d = inner.splitDim
      val bit = bitAt(w(d), inner.bits(d)) // next bit below the inner node's prefix
      if (bit == 0) {
        val r = insertInto(inner.left, idx, w); if (r ne inner.left) inner.left = r
      } else {
        val r = insertInto(inner.right, idx, w); if (r ne inner.right) inner.right = r
      }
      inner
    case leaf: Leaf =>
      leaf.entries += idx
      if (leaf.entries.length > leafCapacity) split(leaf) else leaf
  }

  /** Split a full leaf: raise the cardinality of the dimension whose next bit
    * best balances the entries (ties broken by lowest dimension). If every
    * dimension is at full cardinality the leaf is allowed to overflow.
    */
  private def split(leaf: Leaf): Node = {
    var bestDim = -1
    var bestImbalance = Int.MaxValue
    val half = leaf.entries.length / 2
    var d = 0
    while (d < space.l) {
      if (leaf.bits(d) < space.maxBits) {
        var ones = 0
        leaf.entries.foreach(e => ones += bitAt(words(e)(d), leaf.bits(d)))
        val imbalance = math.abs(ones - half)
        if (imbalance < bestImbalance) { bestImbalance = imbalance; bestDim = d }
      }
      d += 1
    }
    if (bestDim < 0) return leaf // all dimensions exhausted: overflow leaf

    def child(bit: Int): Leaf = {
      val prefix = leaf.prefix.clone()
      val bits = leaf.bits.clone()
      prefix(bestDim) = (prefix(bestDim) << 1) | bit
      bits(bestDim) += 1
      new Leaf(prefix, bits)
    }
    val left = child(0); val right = child(1)
    leaf.entries.foreach { e =>
      if (bitAt(words(e)(bestDim), leaf.bits(bestDim)) == 0) left.entries += e
      else right.entries += e
    }
    val inner = new Inner(leaf.prefix, leaf.bits, bestDim, left, right)
    // A degenerate split can leave one child overflowing — recurse until the
    // capacity invariant holds or cardinality is exhausted.
    if (left.entries.length > leafCapacity) inner.left = split(left)
    if (right.entries.length > leafCapacity) inner.right = split(right)
    inner
  }

  // ---------------------------------------------------------------- querying

  /** One k-NN result: external series id and the (non-squared) distance. */
  def search(query: Array[Float], k: Int): Array[(Long, Double)] = {
    val qz = Series.znorm(query)
    searchProjected(qz, space.project(qz), k)
  }

  /** Descend to the query's own leaf and return exact distances to its
    * entries. */
  private def approxLeaf(qp: Array[Double]): Option[Leaf] = {
    val qWord = space.quantize(qp)
    val qKey = topBitKey(qWord)
    val seedRoot: Option[Node] = root.get(qKey).orElse {
      if (root.isEmpty) None
      else Some(root.values.minBy(n => space.nodeLbSq(qp, n.prefix, n.bits)))
    }
    seedRoot.map { start =>
      var node = start
      while (true) node match {
        case inner: Inner =>
          node = if (bitAt(qWord(inner.splitDim), inner.bits(inner.splitDim)) == 0) inner.left
                 else inner.right
        case leaf: Leaf => return Some(leaf)
      }
      throw new IllegalStateException("unreachable")
    }
  }

  /** Approximate search (paper IV-C first phase, run *once* before the
    * parallel exact phase in MESSI): exact distances to the entries of the
    * query's own leaf, top-k. The distributed layer merges these across
    * partitions into the shared initial BSF.
    */
  def approxSearch(qz: Array[Float], qp: Array[Double], k: Int): Array[(Long, Double)] = {
    if (data.isEmpty || k <= 0) return Array.empty
    approxLeaf(qp) match {
      case None => Array.empty
      case Some(leaf) =>
        leaf.entries.toArray
          .map(e => (ids(e), math.sqrt(Series.edSq(qz, data(e)))))
          .sortBy { case (id, d) => (d, id) }
          .take(k)
    }
  }

  /** Search with the query already z-normalized and projected — the form used
    * by the distributed layer, which projects once on the driver.
    *
    * `initialBsfSq` is an externally supplied upper bound on the global k-th
    * NN distance (MESSI's shared BSF from the approximate phase): any series
    * with a bound/distance at or above it cannot enter the global top-k, so
    * the local heap may legitimately return fewer than k results.
    */
  def searchProjected(qz: Array[Float], qp: Array[Double], k: Int,
                      initialBsfSq: Double = Double.PositiveInfinity): Array[(Long, Double)] = {
    if (data.isEmpty || k <= 0) return Array.empty
    // max-heap of the best k (distSq, idx) so-far; head = current worst kept
    val heap = new java.util.PriorityQueue[(Double, Int)](k, (a: (Double, Int), b: (Double, Int)) => java.lang.Double.compare(b._1, a._1))
    def bsfSq: Double =
      if (heap.size < k) initialBsfSq
      else math.min(initialBsfSq, heap.peek()._1)
    def offer(idx: Int, dSq: Double): Unit = {
      if (heap.size < k) heap.add((dSq, idx))
      else if (dSq < heap.peek()._1) { heap.poll(); heap.add((dSq, idx)) }
    }
    var seededLeaf: Leaf = null // phase-1 leaf; must not be scanned twice
    def scanLeaf(leaf: Leaf): Unit = {
      if (leaf eq seededLeaf) return
      leaf.entries.foreach { e =>
        val bsf = bsfSq
        val lb = space.wordLbSq(qp, words(e), bsf)
        if (lb < bsf) {
          val dSq = Series.edSqEarlyAbandon(qz, data(e), bsf)
          if (dSq < bsf) offer(e, dSq)
        }
      }
    }

    // Phase 1 — approximate search: descend towards the query's own word to
    // seed the BSF with real distances from one leaf (paper IV-C).
    val qWord = space.quantize(qp)
    val qKey = topBitKey(qWord)
    val seedRoot: Option[Node] = root.get(qKey).orElse {
      if (root.isEmpty) None
      else Some(root.values.minBy(n => space.nodeLbSq(qp, n.prefix, n.bits)))
    }
    seedRoot.foreach { start =>
      var node = start
      var done = false
      while (!done) node match {
        case inner: Inner =>
          node = if (bitAt(qWord(inner.splitDim), inner.bits(inner.splitDim)) == 0) inner.left
                 else inner.right
        case leaf: Leaf => scanLeaf(leaf); seededLeaf = leaf; done = true
      }
    }

    // Phase 2 — exact search: best-first traversal by node-level LBD.
    val pq = new java.util.PriorityQueue[(Double, Node)](math.max(1, root.size), (a: (Double, Node), b: (Double, Node)) => java.lang.Double.compare(a._1, b._1))
    root.values.foreach { n =>
      val lb = space.nodeLbSq(qp, n.prefix, n.bits)
      if (lb < bsfSq) pq.add((lb, n))
    }
    while (!pq.isEmpty) {
      val (lb, node) = pq.poll()
      if (lb >= bsfSq) pq.clear() // everything else has a larger LBD: done
      else node match {
        case inner: Inner =>
          Seq(inner.left, inner.right).foreach { c =>
            val clb = space.nodeLbSq(qp, c.prefix, c.bits)
            if (clb < bsfSq) pq.add((clb, c))
          }
        case leaf: Leaf => scanLeaf(leaf)
      }
    }

    val out = new Array[(Long, Double)](heap.size)
    var i = heap.size - 1
    while (i >= 0) { val (dSq, idx) = heap.poll(); out(i) = (ids(idx), math.sqrt(dSq)); i -= 1 }
    out
  }

  // ------------------------------------------------------------- diagnostics

  /** (numLeaves, maxDepth, meanLeafFill) — Figure 8-style index properties. */
  def structureStats: (Int, Int, Double) = {
    var leaves = 0; var maxDepth = 0; var fill = 0L
    def walk(n: Node, depth: Int): Unit = n match {
      case i: Inner => walk(i.left, depth + 1); walk(i.right, depth + 1)
      case l: Leaf  => leaves += 1; maxDepth = math.max(maxDepth, depth); fill += l.entries.length
    }
    root.values.foreach(walk(_, 1))
    (leaves, maxDepth, if (leaves == 0) 0.0 else fill.toDouble / leaves)
  }

  /** All leaves — test hook for structural invariants. */
  def allLeaves: Seq[Leaf] = {
    val buf = mutable.ArrayBuffer.empty[Leaf]
    def walk(n: Node): Unit = n match {
      case i: Inner => walk(i.left); walk(i.right)
      case l: Leaf  => buf += l
    }
    root.values.foreach(walk)
    buf.toSeq
  }

  /** Word of the stored series at internal index `e` — test hook. */
  def wordOf(e: Int): Array[Int] = words(e)
  def idOf(e: Int): Long = ids(e)
}

object TreeIndex {

  /** Build an index over an iterator of (id, raw series); series are
    * z-normalized on insertion. Used from `mapPartitions`.
    */
  def build(space: QuantizedWordSpace, leafCapacity: Int,
            it: Iterator[(Long, Array[Float])], rootBits: Int = 0): TreeIndex = {
    require(leafCapacity >= 1, s"leafCapacity must be >= 1, got $leafCapacity")
    val t = new TreeIndex(space, leafCapacity, rootBits)
    it.foreach { case (id, raw) => t.insert(id, Series.znorm(raw)) }
    t
  }
}
