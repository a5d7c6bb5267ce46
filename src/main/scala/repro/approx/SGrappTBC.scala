package repro.approx

import scala.collection.mutable.ArrayBuffer

import repro.core.{LocalAlgos, Variant}
import repro.graph.{LocalGraph, TemporalEdge}

/** sGrappTBC / sGrappTBC+ / sGrappTBC++ (Appendix A).
  *
  * sGrapp segments the stream into non-overlapping windows of `nTW` unique
  * timestamps, counts butterflies exactly *within* each window with an
  * exact algorithm (here: our temporal counters, per type), and estimates
  * the butterflies *spanning* window boundaries from the empirical
  * power-law between cumulative edge count `EC` and cumulative butterfly
  * count: inter-window count after window k is modeled as
  * `theta_i * EC_k^alpha` for type i.
  *
  * The original sGrapp fits `alpha` on the observed stream and requires a
  * hand-tuned `theta` per dataset; the paper likewise presets a `theta_i`
  * per type (typically giving alpha in [1.0, 1.5]). We reproduce that via
  * [[calibrate]]: run the first `calibWindows` windows, compare against the
  * exact prefix counts, and solve for `theta_i` at a fixed `alpha`.
  */
object SGrappTBC {

  final case class Estimate(perType: Array[Double], windows: Int, edgesSeen: Long)

  /** Split a chronological stream into windows of `nTW` unique timestamps. */
  def windows(edges: IndexedSeq[TemporalEdge], nTW: Int): IndexedSeq[IndexedSeq[TemporalEdge]] = {
    require(nTW > 0)
    val out = ArrayBuffer.empty[IndexedSeq[TemporalEdge]]
    val cur = ArrayBuffer.empty[TemporalEdge]
    var uniq = 0
    var lastT = Long.MinValue
    edges.foreach { e =>
      val isNewT = e.t != lastT
      if (isNewT && uniq == nTW) {
        out += cur.toIndexedSeq; cur.clear(); uniq = 0
      }
      if (isNewT) { uniq += 1; lastT = e.t }
      cur += e
    }
    if (cur.nonEmpty) out += cur.toIndexedSeq
    out.toIndexedSeq
  }

  /** Estimate per-type counts for the whole stream.
    *
    * @param theta per-type inter-window coefficients (length 6); 0 yields
    *              the pure within-window lower bound
    */
  def estimate(
      edges: IndexedSeq[TemporalEdge], delta: Long, nTW: Int,
      theta: Array[Double], alpha: Double = 1.2,
      variant: Variant = Variant.PlusPlus): Estimate = {
    val ws = windows(edges, nTW)
    val within = new Array[Double](6)
    var ec = 0L
    ws.foreach { w =>
      val c = LocalAlgos.count(LocalGraph.fromEdges(w), delta, variant)
      var i = 0; while (i < 6) { within(i) += c(i); i += 1 }
      ec += w.length
    }
    val est = new Array[Double](6)
    var i = 0
    while (i < 6) {
      val inter = if (ws.length > 1) theta(i) * math.pow(ec.toDouble, alpha) else 0.0
      est(i) = within(i) + inter
      i += 1
    }
    Estimate(est, ws.length, ec)
  }

  /** Fit `theta_i` so the estimate matches the exact count on a calibration
    * prefix of `calibWindows` windows.
    */
  def calibrate(
      edges: IndexedSeq[TemporalEdge], delta: Long, nTW: Int,
      calibWindows: Int, alpha: Double = 1.2,
      variant: Variant = Variant.PlusPlus): Array[Double] = {
    val ws = windows(edges, nTW)
    val prefix = ws.take(math.max(2, calibWindows))
    val flat = prefix.flatten
    val exact = LocalAlgos.count(LocalGraph.fromEdges(flat), delta, variant)
    val within = new Array[Long](6)
    prefix.foreach { w =>
      val c = LocalAlgos.count(LocalGraph.fromEdges(w), delta, variant)
      var i = 0; while (i < 6) { within(i) += c(i); i += 1 }
    }
    val ec = flat.length.toDouble
    Array.tabulate(6) { i =>
      val inter = exact(i) - within(i)
      if (inter <= 0 || ec <= 0) 0.0 else inter / math.pow(ec, alpha)
    }
  }
}
