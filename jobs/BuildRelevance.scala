package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.kg.{KGGenerator, RelevanceEngine}

/** spark-submit entrypoint: generate a lite dataset's KG and compute the
  * full meta-graph relevance table with Catalyst self-joins (the bulk
  * relevance-measurement substrate), printing per-meta-graph statistics.
  *
  * Usage: BuildRelevance [dataset=amazon-lite]
  */
object BuildRelevance {
  def main(args: Array[String]): Unit = {
    val name = args.lift(0).getOrElse("amazon-lite")
    val spark = SparkSession.builder.appName(s"relevance-$name").master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    try {
      val cfg = RunDysim.dataset(name, 10.0, 5)
      val edges = KGGenerator.edges(spark, cfg.kg)
      println(s"KG edges: ${edges.count()} of types ${edges.select("etype").distinct().collect().map(_.getString(0)).sorted.mkString(", ")}")
      val rel = RelevanceEngine.relevanceAll(edges, cfg.metaGraphs)
      rel
        .groupBy("meta", "kind")
        .agg(count(lit(1)).as("pairs"), round(avg("s"), 4).as("avg_s"), round(max("s"), 4).as("max_s"))
        .orderBy("meta")
        .show(truncate = false)
    } finally spark.stop()
  }
}
