package repro.sparkdist

import repro.{SparkSpec, TestUtil}
import repro.stream.{STBCPlus, StreamGraph}

/** The Spark batch counter must agree with the in-process STBC+ on both
  * update directions.
  */
class SparkStreamBatchSpec extends SparkSpec {

  private def sortedStream(seed: Int, n: Int) =
    TestUtil.randomEdges(seed, 5, 6, n, 300).sortBy(_.t)

  for (seed <- 1 to 3)
    test(s"insert batch: spark partials equal thread-pool STBC+ (seed $seed)") {
      val edges = sortedStream(seed, 150)
      val delta = 80L
      val (window, batch) = edges.splitAt(110)
      val g = new StreamGraph
      window.foreach(g.insert)
      val local = STBCPlus.insertBatch(g, batch, delta, threads = 2)
      val dist = SparkStreamBatch.countBatch(spark, edges, batch, delta, asMin = false)
      TestUtil.assertCountsEqual(local, dist, s"spark-ins-$seed")
    }

  for (seed <- 4 to 6)
    test(s"delete batch: spark partials equal thread-pool STBC+ (seed $seed)") {
      val edges = sortedStream(seed, 140)
      val delta = 70L
      val batch = edges.take(35)
      val g = new StreamGraph
      edges.foreach(g.insert)
      val local = STBCPlus.deleteBatch(g, batch, delta, threads = 2)
      val dist = SparkStreamBatch.countBatch(spark, edges, batch, delta, asMin = true)
      TestUtil.assertCountsEqual(local, dist, s"spark-del-$seed")
    }

  test("empty batch yields zero") {
    val edges = sortedStream(9, 60)
    val c = SparkStreamBatch.countBatch(spark, edges, Seq.empty, 50L, asMin = true)
    assert(c.forall(_ == 0L))
  }
}
