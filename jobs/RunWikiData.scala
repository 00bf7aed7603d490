package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Experiments

/** spark-submit entrypoint regenerating the Figure 7 data: recall@GT per
  * method over the four curated WikiData-lite pairs.
  *
  * Usage: spark-submit --class repro.jobs.RunWikiData <jar> [rows] [cap]
  */
object RunWikiData {
  def main(args: Array[String]): Unit = {
    val rows = args.lift(0).map(_.toLong).getOrElse(1200L)
    val cap = args.lift(1).map(_.toInt).getOrElse(Experiments.BenchCap)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("valentine-wikidata")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val results = Experiments.runWikiData(spark, rows, cap)
      println(Experiments.renderSummary("Fig.7 data: WikiData pairs", results,
        results.map(_.family).distinct.sorted))
    } finally spark.stop()
  }
}
