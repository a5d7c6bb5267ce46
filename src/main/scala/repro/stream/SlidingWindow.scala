package repro.stream

import repro.graph.TemporalEdge

/** Sliding-window streaming temporal butterfly counting (§ 6.2).
  *
  * The stream is a chronologically-sorted edge sequence; the window holds
  * `window` edges and advances by `stride` edges per step (both measured in
  * edges, as in the paper's Sliding Window Model setup). At every step the
  * maintained per-type counts equal an exact from-scratch count over the
  * window contents — incrementality never approximates.
  *
  * `threads == 0` selects the sequential single-edge algorithm STBC;
  * `threads >= 1` selects the batch algorithm STBC+ with that many worker
  * threads (STBC+-1 matches the paper's single-thread batch variant).
  */
object SlidingWindow {

  final case class Step(index: Int, windowStart: Int, windowEnd: Int, counts: Array[Long])

  def run(
      edges: IndexedSeq[TemporalEdge], window: Int, stride: Int, delta: Long,
      threads: Int = 0,
      onStep: Step => Unit = _ => ()): Array[Long] = {
    require(window > 0 && stride > 0 && stride <= window, "need 0 < stride <= window")
    require(edges.sliding(2).forall(p => p.length < 2 || p(0).t <= p(1).t),
      "stream edges must be chronologically sorted")

    val g = new StreamGraph
    val counts = new Array[Long](6)

    def add(c: Array[Long]): Unit = { var i = 0; while (i < 6) { counts(i) += c(i); i += 1 } }
    def sub(c: Array[Long]): Unit = { var i = 0; while (i < 6) { counts(i) -= c(i); i += 1 } }

    def insertRange(lo: Int, hi: Int): Unit =
      if (threads == 0) {
        var i = lo
        while (i < hi) {
          val e = edges(i)
          g.insert(e)
          add(STBC.countContaining(g, e, delta))
          i += 1
        }
      } else add(STBCPlus.insertBatch(g, edges.slice(lo, hi), delta, threads))

    def deleteRange(lo: Int, hi: Int): Unit =
      if (threads == 0) {
        var i = lo
        while (i < hi) {
          val e = edges(i)
          sub(STBC.countContaining(g, e, delta))
          g.delete(e)
          i += 1
        }
      } else sub(STBCPlus.deleteBatch(g, edges.slice(lo, hi), delta, threads))

    val firstEnd = math.min(window, edges.length)
    insertRange(0, firstEnd)
    var stepIdx = 0
    var start = 0
    var end = firstEnd
    onStep(Step(stepIdx, start, end, counts.clone()))

    while (end < edges.length) {
      val newEnd = math.min(end + stride, edges.length)
      // insert the incoming stride first, then expire the oldest edges —
      // the paper's STBC+ protocol (all insertions land before counting,
      // deletions are counted before they are applied).
      insertRange(end, newEnd)
      val newStart = start + (newEnd - end)
      deleteRange(start, newStart)
      start = newStart
      end = newEnd
      stepIdx += 1
      onStep(Step(stepIdx, start, end, counts.clone()))
    }
    counts
  }
}
