package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.TestUtil
import repro.graph.{Datasets, LocalGraph, SynthBipartite, TemporalEdge}

/** Cross-validates the three counting algorithms against the brute-force
  * reference and against each other over a spread of graph shapes.
  */
class LocalAlgosSpec extends AnyFunSuite {

  private def checkAll(edges: Seq[TemporalEdge], delta: Long, label: String): Unit = {
    val expected = BruteForce.countByType(edges, delta)
    val g = LocalGraph.fromEdges(edges)
    TestUtil.assertCountsEqual(expected, LocalAlgos.tbc(g, delta), s"$label TBC")
    TestUtil.assertCountsEqual(expected, LocalAlgos.tbcPlus(g, delta), s"$label TBC+")
    TestUtil.assertCountsEqual(expected, LocalAlgos.tbcPlusPlus(g, delta), s"$label TBC++")
  }

  test("empty graph counts zero") {
    checkAll(Seq.empty, 100, "empty")
  }

  test("single edge counts zero") {
    checkAll(Seq(TemporalEdge(0, 0, 5)), 100, "single edge")
  }

  test("a wedge is not a butterfly") {
    checkAll(Seq(TemporalEdge(0, 0, 1), TemporalEdge(1, 0, 2)), 100, "wedge")
  }

  for ((name, (tuv, twv, tux, twx), expected) <- Seq(
      ("T0", (1L, 2L, 3L, 4L), 0),
      ("T1", (1L, 3L, 2L, 4L), 1),
      ("T2", (1L, 4L, 2L, 3L), 2),
      ("T3", (1L, 2L, 4L, 3L), 3),
      ("T4", (1L, 3L, 4L, 2L), 4),
      ("T5", (1L, 4L, 3L, 2L), 5)))
    test(s"single butterfly of type $name lands in slot $expected for all algorithms") {
      val edges = TestUtil.singleButterfly(tuv, twv, tux, twx)
      val want = Array.tabulate(6)(i => if (i == expected) 1L else 0L)
      val g = LocalGraph.fromEdges(edges)
      TestUtil.assertCountsEqual(want, BruteForce.countByType(edges, 100), s"$name brute")
      TestUtil.assertCountsEqual(want, LocalAlgos.tbc(g, 100), s"$name TBC")
      TestUtil.assertCountsEqual(want, LocalAlgos.tbcPlus(g, 100), s"$name TBC+")
      TestUtil.assertCountsEqual(want, LocalAlgos.tbcPlusPlus(g, 100), s"$name TBC++")
    }

  test("duration constraint is inclusive: span exactly delta counts") {
    val edges = TestUtil.singleButterfly(1, 2, 3, 11)
    checkAll(edges, 10, "span == delta")
    assert(LocalAlgos.tbc(LocalGraph.fromEdges(edges), 10).sum == 1)
  }

  test("duration constraint: span delta+1 does not count") {
    val edges = TestUtil.singleButterfly(1, 2, 3, 12)
    checkAll(edges, 10, "span == delta+1")
    assert(LocalAlgos.tbc(LocalGraph.fromEdges(edges), 10).sum == 0)
  }

  test("equal timestamps kill the butterfly") {
    val edges = TestUtil.singleButterfly(1, 2, 2, 4)
    checkAll(edges, 100, "equal stamps")
    assert(LocalAlgos.tbcPlusPlus(LocalGraph.fromEdges(edges), 100).sum == 0)
  }

  test("multi-edges between the same pair yield multiple butterflies") {
    // two parallel (u0,l0) edges -> two distinct temporal butterflies
    val edges = TestUtil.singleButterfly(1, 2, 3, 4) :+ TemporalEdge(0, 0, 5)
    checkAll(edges, 100, "parallel edges")
    assert(LocalAlgos.tbcPlusPlus(LocalGraph.fromEdges(edges), 100).sum == 2)
  }

  test("paper example shape: tighter delta removes butterflies") {
    // two butterflies sharing three edges; the wider delta keeps both
    val edges = IndexedSeq(
      TemporalEdge(2, 4, 1), TemporalEdge(3, 4, 6),
      TemporalEdge(2, 5, 11), TemporalEdge(3, 5, 16),
      TemporalEdge(3, 5, 9))
    val wide = BruteForce.countByType(edges, 15).sum
    val tight = BruteForce.countByType(edges, 10).sum
    assert(wide == 2 && tight == 1)
    checkAll(edges, 15, "delta 15")
    checkAll(edges, 10, "delta 10")
  }

  // --- randomized equivalence sweeps over different shapes ---
  for (seed <- 1 to 10)
    test(s"random dense small graph matches brute force (seed $seed)") {
      checkAll(TestUtil.randomEdges(seed, 4, 4, 120, 50), 25, s"dense-$seed")
    }

  for (seed <- 11 to 18)
    test(s"random sparse graph matches brute force (seed $seed)") {
      checkAll(TestUtil.randomEdges(seed, 20, 30, 200, 1000), 200, s"sparse-$seed")
    }

  for (seed <- 19 to 24)
    test(s"random graph with heavy timestamp collisions (seed $seed)") {
      checkAll(TestUtil.randomEdges(seed, 5, 5, 150, 8), 8, s"collide-$seed")
    }

  for (seed <- 25 to 30)
    test(s"skewed star-heavy graph (seed $seed)") {
      // one hub upper vertex: exercises the extreme case of § 4.4
      val rnd = new scala.util.Random(seed)
      val edges = IndexedSeq.fill(180)(TemporalEdge(
        if (rnd.nextInt(3) == 0) rnd.nextInt(6).toLong else 0L,
        rnd.nextInt(12).toLong, rnd.nextInt(300).toLong))
      checkAll(edges, 80, s"star-$seed")
    }

  for (delta <- Seq(1L, 5L, 20L, 100L, 1000000L))
    test(s"delta sweep on one graph (delta=$delta)") {
      checkAll(TestUtil.randomEdges(99, 6, 6, 160, 200), delta, s"delta-$delta")
    }

  test("counts are monotone in delta") {
    val edges = TestUtil.randomEdges(123, 8, 8, 200, 500)
    val g = LocalGraph.fromEdges(edges)
    val sums = Seq(10L, 50L, 100L, 250L, 500L).map(d => LocalAlgos.tbcPlusPlus(g, d).sum)
    assert(sums == sums.sorted)
  }

  test("synthetic catalog graphs at micro scale agree across algorithms") {
    for (spec <- Datasets.all.take(4)) {
      val cfg = spec.cfg.copy(nE = 400, nU = math.min(spec.cfg.nU, 40),
        nL = math.min(spec.cfg.nL, 60), spanDays = 120)
      val edges = SynthBipartite.generate(cfg)
      checkAll(edges, Datasets.DefaultDeltaSeconds, s"catalog-${spec.key}")
    }
  }

  test("deadline aborts long runs with BenchTimeout") {
    val edges = TestUtil.randomEdges(7, 3, 3, 400, 100)
    val g = LocalGraph.fromEdges(edges)
    intercept[BenchTimeout] {
      LocalAlgos.tbc(g, 100, deadline = System.nanoTime() - 1)
    }
  }
}
