package repro.stream

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

import repro.graph.TemporalEdge

/** Mutable temporal bipartite graph for the stream setting (§ 5).
  *
  * Edges arrive in chronological order (the graph-stream assumption of the
  * paper, § 6 "we assume that edges arrive in chronological order") and are
  * deleted oldest-first by the sliding window. Each vertex keeps its
  * incident edges in a time-sorted array with a head offset, so:
  *
  *   - insertion is an O(1) append (timestamps only grow),
  *   - deleting the globally-oldest edge is an O(1) head bump,
  *   - range queries `[lo, hi]` binary-search the live span — the
  *     "store E(u) in a queue ... use binary search to compress the
  *     traversal range" engineering of Algorithm 7.
  *
  * Vertices from both layers share one key space: upper `2u`, lower `2v+1`.
  */
final class StreamGraph {

  private val slotOf = mutable.HashMap.empty[Long, Int]
  private val nbrs  = ArrayBuffer.empty[ArrayBuffer[Long]] // neighbor keys
  private val times = ArrayBuffer.empty[ArrayBuffer[Long]] // parallel timestamps
  private val heads = ArrayBuffer.empty[Int]               // live-range start

  @inline def upperKey(u: Long): Long = u * 2
  @inline def lowerKey(v: Long): Long = v * 2 + 1

  /** Slot of a vertex key, or -1 if the vertex has never been seen. */
  def slot(key: Long): Int = slotOf.getOrElse(key, -1)

  private def ensure(key: Long): Int =
    slotOf.getOrElseUpdate(key, {
      nbrs += new ArrayBuffer[Long]()
      times += new ArrayBuffer[Long]()
      heads += 0
      nbrs.length - 1
    })

  /** Number of live edges incident to slot `s`. */
  def liveDegree(s: Int): Int = if (s < 0) 0 else nbrs(s).length - heads(s)

  /** Total number of live edges. */
  def numEdges: Long = {
    var total = 0L
    var s = 0
    while (s < nbrs.length) { total += liveDegree(s); s += 1 }
    total / 2
  }

  private def append(s: Int, nk: Long, t: Long): Unit = {
    val ts = times(s)
    require(ts.isEmpty || t >= ts(ts.length - 1),
      s"stream graph requires chronological insertion (got $t after ${ts(ts.length - 1)})")
    nbrs(s) += nk
    ts += t
  }

  /** Insert one edge; `t` must not precede any edge already incident to
    * either endpoint.
    */
  def insert(e: TemporalEdge): Unit = {
    val a = ensure(upperKey(e.u))
    val b = ensure(lowerKey(e.v))
    append(a, lowerKey(e.v), e.t)
    append(b, upperKey(e.u), e.t)
  }

  /** Delete one edge. O(1) when it is the oldest live edge of both
    * endpoints (the sliding-window case); falls back to a linear splice.
    */
  def delete(e: TemporalEdge): Unit = {
    removeHalf(slotOf(upperKey(e.u)), lowerKey(e.v), e.t)
    removeHalf(slotOf(lowerKey(e.v)), upperKey(e.u), e.t)
  }

  private def removeHalf(s: Int, nk: Long, t: Long): Unit = {
    val h = heads(s)
    val nb = nbrs(s); val ts = times(s)
    if (h < nb.length && nb(h) == nk && ts(h) == t) {
      heads(s) = h + 1
      maybeCompact(s)
    } else {
      var i = h
      var found = -1
      while (found < 0 && i < nb.length) {
        if (nb(i) == nk && ts(i) == t) found = i
        i += 1
      }
      require(found >= 0, s"edge to slot-$s nbr=$nk t=$t not present")
      nb.remove(found); ts.remove(found)
    }
  }

  private def maybeCompact(s: Int): Unit = {
    val h = heads(s)
    if (h > 64 && h * 2 > nbrs(s).length) {
      nbrs(s) = nbrs(s).drop(h)
      times(s) = times(s).drop(h)
      heads(s) = 0
    }
  }

  /** Visit live incident edges of slot `s` with timestamp in the interval
    * bounded by `lo`/`hi` (each strict or inclusive). Binary-searches the
    * left boundary and stops at the right one.
    */
  def foreachInRange(s: Int, lo: Long, loStrict: Boolean, hi: Long, hiStrict: Boolean)(
      f: (Long, Long) => Unit): Unit = {
    if (s < 0) return
    val nb = nbrs(s); val ts = times(s)
    var a = heads(s); var b = ts.length
    // first live index with ts >= lo (or > lo when strict)
    while (a < b) {
      val m = (a + b) >>> 1
      val below = if (loStrict) ts(m) <= lo else ts(m) < lo
      if (below) a = m + 1 else b = m
    }
    var i = a
    var stop = false
    while (i < ts.length && !stop) {
      val t = ts(i)
      if (if (hiStrict) t >= hi else t > hi) stop = true
      else { f(nb(i), t); i += 1 }
    }
  }
}
