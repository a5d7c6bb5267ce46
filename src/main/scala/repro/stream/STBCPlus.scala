package repro.stream

import java.util.concurrent.{Callable, Executors, TimeUnit}
import scala.collection.mutable
import scala.collection.mutable.ArrayBuffer

import repro.graph.TemporalEdge

/** STBC+ (Algorithm 8): batch stream updates with multi-core parallelism.
  *
  * Count conflicts across a batch are resolved by Lemma 8: a temporal
  * butterfly is charged to exactly one batch edge — the one holding its
  * unique minimum timestamp for deletions (traversal range `(t, t + delta]`)
  * and its unique maximum for insertions (range `[t - delta, t)`). With the
  * range pinned to one side of `t`, the duration constraint holds by
  * construction, so the dynamic red-black trees of TBC++ degrade to two
  * plain sorted arrays `VS`/`VA` per direction and every coverage case is a
  * pair of binary searches.
  *
  * The maximum-side counting is implemented by time reversal: negating all
  * timestamps turns "edge is the unique maximum over `[t - delta, t)`" into
  * "edge is the unique minimum over `(-t, -t + delta]`", and the butterfly
  * type is invariant under time reversal (both wedge directions flip, so
  * direction-equality and coverage are preserved).
  *
  * Batch edges are spread over a thread pool; each worker accumulates into
  * a private count array and the partials are summed — no shared mutable
  * state during counting (edges are physically inserted before / deleted
  * after the counting pass, exactly as the paper prescribes to avoid
  * read-write conflicts).
  */
object STBCPlus {

  /** Per-direction sorted leg arrays — the paper's `VS` (start legs) and
    * `VA` (end legs), sorted independently.
    */
  private final class DirArrays {
    val vs = new ArrayBuffer[Long]()
    val va = new ArrayBuffer[Long]()
    def sortInPlace(): Unit = { vs.sortInPlace(); va.sortInPlace() }
  }

  private def countLess(xs: ArrayBuffer[Long], x: Long): Int = {
    var lo = 0; var hi = xs.length
    while (lo < hi) { val m = (lo + hi) >>> 1; if (xs(m) < x) lo = m + 1 else hi = m }
    lo
  }
  private def countLessOrEqual(xs: ArrayBuffer[Long], x: Long): Int = {
    var lo = 0; var hi = xs.length
    while (lo < hi) { val m = (lo + hi) >>> 1; if (xs(m) <= x) lo = m + 1 else hi = m }
    lo
  }
  private def countGreater(xs: ArrayBuffer[Long], x: Long): Int = xs.length - countLessOrEqual(xs, x)
  private def countGreaterOrEqual(xs: ArrayBuffer[Long], x: Long): Int = xs.length - countLess(xs, x)

  /** Count the butterflies in which `e` carries the strict minimum
    * timestamp (`asMin = true`) or strict maximum (`asMin = false`).
    * The edge must be present in `g`.
    */
  def countExtreme(g: StreamGraph, e: TemporalEdge, delta: Long, asMin: Boolean): Array[Long] = {
    val counts = new Array[Long](6)
    val uKey = g.upperKey(e.u)
    val vKey = g.lowerKey(e.v)
    val t = e.t
    // Under time reversal every collected timestamp is negated; `sgn`
    // folds that into the collection step.
    val sgn = if (asMin) 1L else -1L
    val (lo, hi) = if (asMin) (t, t + delta) else (t - delta, t)
    val loStrict = asMin
    val hiStrict = !asMin

    // end-vertex -> (via-v end legs, via-other wedges split by direction)
    val h = mutable.HashMap.empty[Long, (ArrayBuffer[Long], DirArrays, DirArrays)]
    def entry(w: Long) = h.getOrElseUpdate(w, (new ArrayBuffer[Long](), new DirArrays, new DirArrays))

    g.foreachInRange(g.slot(uKey), lo, loStrict, hi, hiStrict) { (xKey, t1) =>
      if (xKey != vKey) {
        g.foreachInRange(g.slot(xKey), lo, loStrict, hi, hiStrict) { (wKey, t2) =>
          if (wKey != uKey && t2 != t1) {
            val (_, fwd, bwd) = entry(wKey)
            val s = sgn * t1; val a = sgn * t2
            val d = if (s < a) fwd else bwd
            d.vs += math.min(s, a)
            d.va += math.max(s, a)
          }
        }
      }
    }
    g.foreachInRange(g.slot(vKey), lo, loStrict, hi, hiStrict) { (wKey, t2) =>
      if (wKey != uKey) entry(wKey)._1 += sgn * t2
    }

    h.foreach { case (_, (viaV, fwd, bwd)) =>
      if (viaV.nonEmpty && (fwd.vs.nonEmpty || bwd.vs.nonEmpty)) {
        fwd.sortInPlace(); bwd.sortInPlace()
        viaV.foreach { a =>
          // The via-v wedge (sgn*t, a) is forward with the globally minimal
          // start leg, so versus same-direction (fwd) wedges the coverage
          // cases reduce to rank queries (cf. Query() of Algorithm 4):
          counts(0) += countGreater(fwd.vs, a)                                // c11
          counts(1) += countGreater(fwd.va, a) - countGreaterOrEqual(fwd.vs, a) // c13
          counts(2) += countLess(fwd.va, a)                                   // c15
          counts(3) += countGreater(bwd.vs, a)
          counts(4) += countGreater(bwd.va, a) - countGreaterOrEqual(bwd.vs, a)
          counts(5) += countLess(bwd.va, a)
        }
      }
    }
    counts
  }

  /** Parallel fold of `countExtreme` over a batch. */
  private def batchCount(
      g: StreamGraph, batch: Seq[TemporalEdge], delta: Long,
      asMin: Boolean, threads: Int): Array[Long] = {
    val total = new Array[Long](6)
    if (batch.isEmpty) return total
    val nThreads = math.max(1, threads)
    if (nThreads == 1) {
      batch.foreach { e =>
        val c = countExtreme(g, e, delta, asMin)
        var i = 0; while (i < 6) { total(i) += c(i); i += 1 }
      }
      total
    } else {
      val pool = Executors.newFixedThreadPool(nThreads)
      try {
        val tasks = (0 until nThreads).map { k =>
          new Callable[Array[Long]] {
            def call(): Array[Long] = {
              val local = new Array[Long](6)
              var i = k
              while (i < batch.length) {
                val c = countExtreme(g, batch(i), delta, asMin)
                var j = 0; while (j < 6) { local(j) += c(j); j += 1 }
                i += nThreads
              }
              local
            }
          }
        }
        import scala.jdk.CollectionConverters._
        pool.invokeAll(tasks.asJava).asScala.foreach { fut =>
          val c = fut.get()
          var i = 0; while (i < 6) { total(i) += c(i); i += 1 }
        }
      } finally {
        pool.shutdown()
        pool.awaitTermination(1, TimeUnit.HOURS)
      }
      total
    }
  }

  /** Insert a chronologically-sorted batch; returns the per-type counts of
    * butterflies created. Edges are inserted first, then counted (each on
    * its maximum-timestamp edge), per the paper's conflict-free protocol.
    */
  def insertBatch(g: StreamGraph, batch: Seq[TemporalEdge], delta: Long,
                  threads: Int = 1): Array[Long] = {
    batch.foreach(g.insert)
    batchCount(g, batch, delta, asMin = false, threads)
  }

  /** Delete a batch of the globally-oldest edges; returns the per-type
    * counts of butterflies destroyed. Counting happens before deletion
    * (each butterfly on its minimum-timestamp edge).
    */
  def deleteBatch(g: StreamGraph, batch: Seq[TemporalEdge], delta: Long,
                  threads: Int = 1): Array[Long] = {
    val removed = batchCount(g, batch, delta, asMin = true, threads)
    batch.foreach(g.delete)
    removed
  }
}
