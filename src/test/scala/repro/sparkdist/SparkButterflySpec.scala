package repro.sparkdist

import repro.{SparkSpec, TestUtil}
import repro.core.{BruteForce, Instance, LocalAlgos, Variant}
import repro.graph.{LocalGraph, SynthBipartite, TemporalEdge}

/** The distributed pipeline must agree with the local drivers for every
  * variant, on counting and enumeration, across graph shapes.
  */
class SparkButterflySpec extends SparkSpec {

  private def df(edges: Seq[TemporalEdge]) = SparkButterfly.edgesToDF(spark, edges)

  private def check(edges: Seq[TemporalEdge], delta: Long, label: String): Unit = {
    val expected = BruteForce.countByType(edges, delta)
    for (variant <- Variant.all) {
      val got = SparkButterfly.count(df(edges), delta, variant)
      TestUtil.assertCountsEqual(expected, got, s"$label spark-${variant.name}")
    }
  }

  test("empty edges count zero") {
    val e = spark.emptyDataFrame
    // an empty frame has no schema; build a typed empty frame instead
    val empty = SparkButterfly.edgesToDF(spark, Seq.empty[TemporalEdge])
    assert(SparkButterfly.count(empty, 10, Variant.PlusPlus).forall(_ == 0))
    assert(e.isEmpty) // silence unused warning path
  }

  for ((name, stamps, slot) <- Seq(
      ("T0", (1L, 2L, 3L, 4L), 0), ("T1", (1L, 3L, 2L, 4L), 1),
      ("T3", (1L, 2L, 4L, 3L), 3), ("T4", (1L, 3L, 4L, 2L), 4)))
    test(s"spark pipeline classifies a single $name butterfly") {
      val edges = TestUtil.singleButterfly(stamps._1, stamps._2, stamps._3, stamps._4)
      val got = SparkButterfly.count(df(edges), 100, Variant.PlusPlus)
      assert(got(slot) == 1 && got.sum == 1)
    }

  for (seed <- 1 to 4)
    test(s"spark matches brute force on random graph (seed $seed)") {
      check(TestUtil.randomEdges(seed, 5, 6, 120, 80), 40, s"rand-$seed")
    }

  test("spark matches brute force under timestamp collisions") {
    check(TestUtil.randomEdges(42, 4, 4, 100, 9), 9, "collisions")
  }

  test("spark matches local TBC++ on a synthetic catalog graph") {
    val cfg = SynthBipartite.Config(nU = 30, nL = 50, nE = 800, spanDays = 200, seed = 7)
    val edges = SynthBipartite.generate(cfg)
    val delta = 40L * SynthBipartite.SecondsPerDay
    val local = LocalAlgos.tbcPlusPlus(LocalGraph.fromEdges(edges), delta)
    val dist = SparkButterfly.count(df(edges), delta, Variant.PlusPlus)
    TestUtil.assertCountsEqual(local, dist, "catalog")
  }

  test("spark enumeration matches brute-force instance multiset") {
    val edges = TestUtil.randomEdges(11, 4, 5, 90, 60)
    val want = BruteForce.enumerate(edges, 30).groupBy(identity).view.mapValues(_.size).toMap
    val got = SparkButterfly.enumerate(df(edges), 30).collect()
      .groupBy(identity).view.mapValues(_.size).toMap
    assert(got == want)
  }

  test("spark enumeration agrees between baseline and plus variants") {
    val edges = TestUtil.randomEdges(12, 4, 4, 80, 40)
    def ms(v: Variant): Map[Instance, Int] =
      SparkButterfly.enumerate(df(edges), 20, v).collect()
        .groupBy(identity).view.mapValues(_.size).toMap
    assert(ms(Variant.Baseline) == ms(Variant.Plus))
  }

  test("wedge DataFrame honors priority and pruning") {
    val edges = TestUtil.randomEdges(13, 4, 4, 60, 50)
    val pruned = SparkButterfly.wedges(df(edges), 10, prune = true).collect()
    assert(pruned.forall(w => w.t1 != w.t2 && math.abs(w.t2 - w.t1) <= 10))
    val all = SparkButterfly.wedges(df(edges), 10, prune = false).collect()
    assert(all.length >= pruned.length)
    // every wedge starts and ends on different vertices of the same layer
    assert(all.forall(w => (w.a & 1) == (w.w & 1) && w.a != w.w && (w.m & 1) != (w.a & 1)))
  }
}
