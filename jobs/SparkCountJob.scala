package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.Variant
import repro.eval.Eval
import repro.graph.Datasets
import repro.sparkdist.SparkButterfly

/** Distributed temporal butterfly counting via the Spark pipeline.
  *
  * spark-submit --class repro.jobs.SparkCountJob <jar> [dataset] [deltaDays] [variant]
  */
object SparkCountJob {
  def main(args: Array[String]): Unit = {
    val key = args.lift(0).getOrElse("WN")
    val deltaDays = args.lift(1).map(_.toLong).getOrElse(40L)
    val variant = args.lift(2).getOrElse("plusplus") match {
      case "baseline" => Variant.Baseline
      case "plus"     => Variant.Plus
      case _          => Variant.PlusPlus
    }
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"tbfc-$key")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val edges = Eval.edgesOf(Datasets.byKey(key))
      val df = SparkButterfly.edgesToDF(spark, edges)
      val t = Eval.time(SparkButterfly.count(df, deltaDays * 86400L, variant))
      println(s"dataset=$key |E|=${edges.length} delta=${deltaDays}d variant=${variant.name}")
      println((0 until 6).map(i => s"T$i=${t.value(i)}").mkString(" "))
      println(f"total=${t.value.sum} time=${t.millis}%.1f ms")
    } finally spark.stop()
  }
}
