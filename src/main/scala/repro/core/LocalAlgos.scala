package repro.core

import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer
import repro.graph.LocalGraph

/** Single-JVM drivers for the five algorithms of §§ 3–4: TBC, TBE, TBC+,
  * TBE+, TBC++. These mirror the C++ reference structure: iterate every
  * vertex as start-vertex, enumerate wedges toward strictly lower-priority
  * middle- and end-vertices, group per end-vertex, and combine.
  *
  * Memory stays O(|E| + max |W(u)|): the wedge groups of one start-vertex
  * are discarded before the next is processed.
  */
object LocalAlgos {

  /** Enumerate the wedges of one start-vertex, grouped by end-vertex.
    * `prune` applies Lemma 1 at enumeration time (TBC+/TBC++); the baseline
    * stores every wedge and defers all checks to the combine phase.
    */
  private def wedgeGroups(
      g: LocalGraph, u: Int, delta: Long, prune: Boolean
  ): mutable.LinkedHashMap[Int, ArrayBuffer[(Long, Long, Long)]] = {
    val h = mutable.LinkedHashMap.empty[Int, ArrayBuffer[(Long, Long, Long)]]
    val pu = g.pri(u)
    val nbrs = g.adjN(u); val times = g.adjT(u)
    var i = 0
    while (i < nbrs.length) {
      val v = nbrs(i); val t1 = times(i)
      if (pu > g.pri(v)) {
        val nbrs2 = g.adjN(v); val times2 = g.adjT(v)
        var j = 0
        while (j < nbrs2.length) {
          val w = nbrs2(j); val t2 = times2(j)
          if (pu > g.pri(w) && (!prune || (t1 != t2 && math.abs(t2 - t1) <= delta)))
            h.getOrElseUpdate(w, new ArrayBuffer) += ((g.origId(v).toLong, t1, t2))
          j += 1
        }
      }
      i += 1
    }
    h
  }

  /** Run `variant` counting over the whole graph. */
  def count(g: LocalGraph, delta: Long, variant: Variant,
            deadline: Long = Long.MaxValue): Array[Long] = {
    val counts = new Array[Long](ButterflyType.NumTypes)
    val prune = variant != Variant.Baseline
    var u = 0
    while (u < g.n) {
      val h = wedgeGroups(g, u, delta, prune)
      h.foreach { case (_, ws) =>
        if (ws.length > 1)
          LocalCombine.count(ws, g.layer(u).toInt, delta, variant, counts, deadline)
      }
      u += 1
    }
    counts
  }

  /** TBC — the baseline counting algorithm (Algorithm 1). */
  def tbc(g: LocalGraph, delta: Long, deadline: Long = Long.MaxValue): Array[Long] =
    count(g, delta, Variant.Baseline, deadline)

  /** TBC+ — wedge sets + wedge priority + hashmap HP (Algorithm 2/3/4). */
  def tbcPlus(g: LocalGraph, delta: Long, deadline: Long = Long.MaxValue): Array[Long] =
    count(g, delta, Variant.Plus, deadline)

  /** TBC++ — TBC+ with the twin order-statistic trees (Algorithm 6). */
  def tbcPlusPlus(g: LocalGraph, delta: Long, deadline: Long = Long.MaxValue): Array[Long] =
    count(g, delta, Variant.PlusPlus, deadline)

  /** Run `variant` enumeration; `collect` decides whether instances are
    * materialized (tests) or only counted (benches mirror the paper's
    * "no output" protocol).
    */
  def enumerate(
      g: LocalGraph, delta: Long, variant: Variant,
      collect: Boolean, deadline: Long = Long.MaxValue
  ): (Long, ArrayBuffer[Instance]) = {
    val out = new ArrayBuffer[Instance]()
    var total = 0L
    val prune = variant != Variant.Baseline
    var u = 0
    while (u < g.n) {
      val h = wedgeGroups(g, u, delta, prune)
      val layer = g.layer(u).toInt
      val startOrig = g.origId(u)
      h.foreach { case (w, ws) =>
        if (ws.length > 1) {
          val endOrig = g.origId(w)
          val sink = new SetCross.EnumSink {
            def emit(btype: Int, mid1: Long, s1: Long, a1: Long,
                     mid2: Long, s2: Long, a2: Long): Unit = {
              total += 1
              if (collect)
                out += Instance.canonical(btype, layer, startOrig, endOrig, mid1, mid2, s1, a1, s2, a2)
            }
          }
          LocalCombine.enumerate(ws, layer, delta, variant, sink, deadline)
        }
      }
      u += 1
    }
    (total, out)
  }

  /** TBE — baseline enumeration (§ 3). */
  def tbe(g: LocalGraph, delta: Long, collect: Boolean = true,
          deadline: Long = Long.MaxValue): (Long, ArrayBuffer[Instance]) =
    enumerate(g, delta, Variant.Baseline, collect, deadline)

  /** TBE+ — optimized enumeration (§ 4.3). */
  def tbePlus(g: LocalGraph, delta: Long, collect: Boolean = true,
              deadline: Long = Long.MaxValue): (Long, ArrayBuffer[Instance]) =
    enumerate(g, delta, Variant.Plus, collect, deadline)
}
