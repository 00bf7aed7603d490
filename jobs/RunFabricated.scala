package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Experiments

/** spark-submit entrypoint regenerating the Figure 4–6 data: grid-best
  * Recall@GT (min/median/max) per method family and relatedness scenario
  * over the fabricated TPC-DI-lite / OpenData-lite / ChEMBL-lite pairs.
  *
  * Usage: spark-submit --class repro.jobs.RunFabricated <jar> [rows] [cap]
  */
object RunFabricated {
  def main(args: Array[String]): Unit = {
    val rows = args.lift(0).map(_.toLong).getOrElse(Experiments.BenchRows)
    val cap = args.lift(1).map(_.toInt).getOrElse(Experiments.BenchCap)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("valentine-fabricated")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val results = Experiments.runFabricated(spark, rows, cap)
      println(Experiments.renderSummary("Fig.4 data: schema-based methods", results,
        Seq("Cupid", "SimilarityFlooding", "COMA-schema")))
      println(Experiments.renderSummary("Fig.5 data: instance-based methods", results,
        Seq("COMA-instance", "DistributionBased", "JaccardLevenshtein")))
      println(Experiments.renderSummary("Fig.6 data: hybrid methods", results,
        Seq("EmbDI", "SemProp")))
    } finally spark.stop()
  }
}
