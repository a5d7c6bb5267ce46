package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.jobs.StreamingEval

/** Figures 18/19/20-style streaming benchmarks on the LF and WT
  * counterparts: sliding-window counting time for STBC vs STBC+ over
  * varying |window|, |stride| and thread counts. Each configuration
  * processes a bounded number of slides so the bench stays minutes-scale;
  * relative shape (parallel speedup, stride behavior) is what matters.
  */
class StreamBench extends AnyFunSuite {

  private val Keys = Seq("LF", "WT")
  private val MaxSteps = 10

  test("Varying |window| (stride = 5%)") {
    val lines = collection.mutable.ArrayBuffer.empty[String]
    StreamingEval.varyingWindow(Keys, MaxSteps, windows = Seq(500, 1000, 2000, 4000),
      out = s => { println(s); lines += s })
    assert(lines.exists(_.contains("|window|")))
  }

  test("Varying |stride|/|window| (window = 2000)") {
    StreamingEval.varyingStride(Keys, MaxSteps, window = 2000)
  }

  test("Varying |thread| (window = 2000)") {
    StreamingEval.varyingThreads(Keys, MaxSteps, window = 2000)
  }

  test("Parallel STBC+ beats single-threaded STBC+ on the heavier per-edge workload") {
    // LF carries the hub-heavy per-edge updates where parallelism pays off;
    // on WT the slides are so cheap that thread overhead dominates — the
    // same diminishing-returns effect the paper reports in Figure 20.
    val t1 = StreamingEval.slideTime("LF", window = 2000, stride = 100, threads = 1, MaxSteps)
    val t8 = StreamingEval.slideTime("LF", window = 2000, stride = 100, threads = 8, MaxSteps)
    println(f"LF window=2000 stride=100: STBC+-1 = $t1%.1f ms, STBC+-8 = $t8%.1f ms")
    assert(t8 < t1, "8 threads faster than 1 on batch updates")
  }
}
