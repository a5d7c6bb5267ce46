package repro.core

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer
import repro.graph.TemporalEdge

/** Direct O(paired-wedges) reference implementation, used by tests as an
  * in-JVM oracle next to the DuckDB SQL oracle. It deliberately shares no
  * machinery with the optimized algorithms: no vertex priorities, no wedge
  * sets, no pruning — just "for every upper-vertex pair, pair up wedges with
  * different lower middle-vertices".
  */
object BruteForce {

  /** Exact per-type counts. */
  def countByType(edges: Seq[TemporalEdge], delta: Long): Array[Long] = {
    val counts = new Array[Long](ButterflyType.NumTypes)
    foreachButterfly(edges, delta) { (t, _, _, _, _, _, _, _, _) => counts(t) += 1 }
    counts
  }

  /** Exact instance list (canonical form). */
  def enumerate(edges: Seq[TemporalEdge], delta: Long): ArrayBuffer[Instance] = {
    val out = new ArrayBuffer[Instance]()
    foreachButterfly(edges, delta) { (t, u0, u1, l0, l1, tuv, tux, twv, twx) =>
      out += Instance.canonical(t, 0, u0, u1, l0, l1, tuv, twv, tux, twx)
    }
    out
  }

  /** Visit every temporal butterfly once.
    *
    * The callback receives: type, the upper pair (u0 < u1), the lower pair
    * (l0 < l1), and the four edge timestamps t(u0,l0), t(u0,l1), t(u1,l0),
    * t(u1,l1). Types are classified from the U-layer perspective, which the
    * conversion rule (§ 4.1) fixes as the canonical one.
    */
  def foreachButterfly(edges: Seq[TemporalEdge], delta: Long)(
      f: (Int, Long, Long, Long, Long, Long, Long, Long, Long) => Unit): Unit = {
    // wedges keyed by (upper pair): list of (lower mid, t at u0, t at u1)
    val byPair = mutable.HashMap.empty[(Long, Long), ArrayBuffer[(Long, Long, Long)]]
    val byLower = mutable.HashMap.empty[Long, ArrayBuffer[(Long, Long)]] // v -> (u, t)
    edges.foreach(e => byLower.getOrElseUpdate(e.v, new ArrayBuffer) += ((e.u, e.t)))
    byLower.foreach { case (v, inc) =>
      var i = 0
      while (i < inc.length) {
        var j = 0
        while (j < i) {
          val (ua, ta) = inc(i); val (ub, tb) = inc(j)
          if (ua != ub) {
            val key = if (ua < ub) (ua, ub) else (ub, ua)
            val (t0, t1) = if (ua < ub) (ta, tb) else (tb, ta)
            byPair.getOrElseUpdate(key, new ArrayBuffer) += ((v, t0, t1))
          }
          j += 1
        }
        i += 1
      }
    }
    byPair.foreach { case ((u0, u1), ws) =>
      var i = 0
      while (i < ws.length) {
        var j = 0
        while (j < i) {
          val (vi, si, ai) = ws(i); val (vj, sj, aj) = ws(j)
          if (vi != vj && ButterflyType.isValid(si, ai, sj, aj, delta)) {
            val t = ButterflyType.classify(si, ai, sj, aj, 0)
            val (l0, l1, tuv, twv, tux, twx) =
              if (vi < vj) (vi, vj, si, ai, sj, aj) else (vj, vi, sj, aj, si, ai)
            f(t, u0, u1, l0, l1, tuv, tux, twv, twx)
          }
          j += 1
        }
        i += 1
      }
    }
  }
}
