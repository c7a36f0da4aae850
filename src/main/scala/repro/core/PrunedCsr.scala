package repro.core

/** Hook for the paging experiment (Table 6): every column-array access can be
  * reported to a tracer that simulates an LRU page cache.
  */
trait AccessTracer {
  /** Called with the absolute column-array index of every entry access. */
  def onAccess(entryIndex: Int): Unit
}

/** The pruned dual-index CSR of Section 3.2.1 / 4.2.
  *
  * Per vertex the column array holds one contiguous block: the *out*-list
  * (edges whose input-edge-list orientation is `(v, u)`) followed by the
  * *in*-list (edges `(u, v)`), each with its own mutable size field so a
  * removed entry can be swap-replaced by the last valid entry of its region
  * in O(1) — the paper's lazy-edge-removal mechanics.
  *
  * Pruning: vertices with `d(v) > tau * meanDegree` are *high-degree*; their
  * adjacency lists are omitted entirely, and edges between two high-degree
  * vertices are diverted into [[h2hEdgeIds]] (the paper's "external edge
  * file" that the streaming phase consumes). `tau = None` disables pruning
  * (used by the NE baseline).
  *
  * Each column entry packs `(neighbour id, edge id)` into one Long so that a
  * partitioner can record assignments against the original edge list. The
  * paper stores 4-byte neighbour ids only; [[memoryFootprintBytes]]
  * deliberately reports the paper's Section 4.2 model (b_id = 4), not the
  * JVM representation, so memory comparisons match the paper's accounting.
  */
final class PrunedCsr private (
    val g: GraphData,
    val tau: Option[Double],
    private val high: Array[Boolean],
    private val blockStart: Array[Int],
    private val outCap: Array[Int],
    private val inCap: Array[Int],
    private val outSizeArr: Array[Int],
    private val inSizeArr: Array[Int],
    private val col: Array[Long],
    val h2hEdgeIds: Array[Int],
) {

  /** Optional column-array access tracer (Table 6 paging simulation). */
  var tracer: AccessTracer = null

  /** True iff `v` was classified high-degree at build time. */
  def isHigh(v: Int): Boolean = high(v)

  /** Number of high-degree vertices. */
  lazy val highCount: Int = high.count(identity)

  /** Edges kept in memory (everything but the h2h set). */
  def inMemEdgeCount: Int = g.nE - h2hEdgeIds.length

  /** Total column-array length (2 entries per in-memory low/low edge, one
    * per low/high edge).
    */
  def colLength: Int = col.length

  // -- region accessors ------------------------------------------------------

  def outStart(v: Int): Int = blockStart(v)
  def outSize(v: Int): Int = outSizeArr(v)
  def inStart(v: Int): Int = blockStart(v) + outCap(v)
  def inSize(v: Int): Int = inSizeArr(v)

  /** Remaining (valid, unremoved) adjacency entries of `v`. */
  def validDegree(v: Int): Int = outSizeArr(v) + inSizeArr(v)

  /** Neighbour id stored at absolute column index `i`. */
  def nbrAt(i: Int): Int = {
    if (tracer ne null) tracer.onAccess(i)
    (col(i) >>> 32).toInt
  }

  /** Edge id stored at absolute column index `i` (no second tracer report —
    * an entry read is one logical access).
    */
  def eidAt(i: Int): Int = col(i).toInt

  // -- lazy removal ----------------------------------------------------------

  /** Swap-remove the out-entry at absolute index `i` of vertex `v`. */
  def removeOutAt(v: Int, i: Int): Unit = {
    val last = blockStart(v) + outSizeArr(v) - 1
    require(i >= blockStart(v) && i <= last, s"out index $i invalid for vertex $v")
    if (tracer ne null) { tracer.onAccess(i); tracer.onAccess(last) }
    col(i) = col(last)
    outSizeArr(v) -= 1
  }

  /** Swap-remove the in-entry at absolute index `i` of vertex `v`. */
  def removeInAt(v: Int, i: Int): Unit = {
    val st = inStart(v)
    val last = st + inSizeArr(v) - 1
    require(i >= st && i <= last, s"in index $i invalid for vertex $v")
    if (tracer ne null) { tracer.onAccess(i); tracer.onAccess(last) }
    col(i) = col(last)
    inSizeArr(v) -= 1
  }

  // -- memory model ----------------------------------------------------------

  /** Byte footprint under the paper's Section 4.2 model:
    * column array (`Σ_{v∈V_l} d'(v) * b_id`) + two index arrays + two size
    * fields per vertex (`6 * |V| * b_id`) + `k+1` dense bitsets + min-heap
    * with lookup table (`2 * |V| * b_id`, folded into the `6|V|` term by the
    * paper; we follow the paper's printed total).
    */
  def memoryFootprintBytes(k: Int): Long = {
    val bId = 4L
    col.length.toLong * bId + 6L * g.nV * bId + (g.nV.toLong * (k + 1) + 7) / 8
  }
}

object PrunedCsr {

  /** Two-pass CSR build (Section 4.1 "Graph Building"): pass 1 computes
    * degrees (already cached on [[GraphData]]) and the index arrays; pass 2
    * inserts each edge into the column array, or into the h2h buffer when
    * both endpoints are high-degree.
    */
  def build(g: GraphData, tau: Option[Double]): PrunedCsr = {
    val nV = g.nV
    val d = g.degrees
    val mean = g.meanDegree
    val high = new Array[Boolean](nV)
    tau.foreach { t =>
      require(t > 0, s"tau must be positive, got $t")
      var v = 0
      while (v < nV) { high(v) = d(v) > t * mean; v += 1 }
    }

    val outCnt = new Array[Int](nV)
    val inCnt = new Array[Int](nV)
    var h2h = 0
    var e = 0
    while (e < g.nE) {
      val u = g.src(e); val v = g.dst(e)
      if (high(u) && high(v)) h2h += 1
      else {
        if (!high(u)) outCnt(u) += 1
        if (!high(v)) inCnt(v) += 1
      }
      e += 1
    }

    val blockStart = new Array[Int](nV)
    var run = 0
    var v = 0
    while (v < nV) {
      blockStart(v) = run
      run += outCnt(v) + inCnt(v)
      v += 1
    }

    val col = new Array[Long](run)
    val outFill = new Array[Int](nV)
    val inFill = new Array[Int](nV)
    val h2hIds = new Array[Int](h2h)
    var h = 0
    e = 0
    while (e < g.nE) {
      val u = g.src(e); val w = g.dst(e)
      if (high(u) && high(w)) { h2hIds(h) = e; h += 1 }
      else {
        val packedFwd = (w.toLong << 32) | (e.toLong & 0xffffffffL)
        val packedBwd = (u.toLong << 32) | (e.toLong & 0xffffffffL)
        if (!high(u)) { col(blockStart(u) + outFill(u)) = packedFwd; outFill(u) += 1 }
        if (!high(w)) { col(blockStart(w) + outCnt(w) + inFill(w)) = packedBwd; inFill(w) += 1 }
      }
      e += 1
    }

    new PrunedCsr(g, tau, high, blockStart, outCnt, inCnt,
      outFill, inFill, col, h2hIds)
  }
}
