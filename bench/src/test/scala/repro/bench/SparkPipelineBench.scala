package repro.bench

import repro.SparkSpec
import repro.core.{LocalAlgos, Variant}
import repro.eval.Eval
import repro.graph.Datasets
import repro.sparkdist.SparkButterfly

/** Distributed-pipeline benchmark: the Spark join/aggregate formulation of
  * the three counting variants on mid-size datasets, cross-checked against
  * the local TBC++ counts. The shuffle overhead dominates at repro scale;
  * the point is that the distributed combine stage carries the same
  * baseline-vs-optimized gap inside `flatMapGroups`.
  */
class SparkPipelineBench extends SparkSpec {

  private val Keys = Seq("WN", "CU", "TW")

  test("Spark pipeline: counting time per variant, counts verified") {
    val delta = Datasets.DefaultDeltaSeconds
    val rows = Keys.map { key =>
      val spec = Datasets.byKey(key)
      val edges = Eval.edgesOf(spec)
      val df = SparkButterfly.edgesToDF(spark, edges).cache()
      df.count() // materialize the cache so timing excludes generation
      val expect = LocalAlgos.tbcPlusPlus(Eval.graphOf(spec), delta)
      val cells = Variant.all.map { v =>
        val t = Eval.time(SparkButterfly.count(df, delta, v))
        assert(t.value.sameElements(expect), s"$key/${v.name}: counts match local TBC++")
        t.millis
      }
      df.unpersist()
      Seq(key, expect.sum.toString) ++ cells.map(ms => f"$ms%.0f")
    }
    println("\n=== Spark distributed pipeline (delta = 40 days) ===")
    Eval.printTable(
      Seq("Dataset", "Total", "baseline(ms)", "plus(ms)", "plusplus(ms)"), rows)
  }
}
