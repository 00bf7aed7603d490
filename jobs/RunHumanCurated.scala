package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Experiments

/** spark-submit entrypoint regenerating Table III: Recall@GT per method on
  * the Magellan-lite pairs (average of 7) and on ING-lite #1/#2.
  *
  * Usage: spark-submit --class repro.jobs.RunHumanCurated <jar> [cap]
  */
object RunHumanCurated {
  def main(args: Array[String]): Unit = {
    val cap = args.lift(0).map(_.toInt).getOrElse(Experiments.BenchCap)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("valentine-human-curated")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val t3 = Experiments.tableIII(spark, cap)
      val rows = t3.toSeq.sortBy(_._1).map { case (f, (mag, i1, i2)) =>
        Seq(f, Experiments.fmt(mag), Experiments.fmt(i1), Experiments.fmt(i2))
      }
      println(Experiments.render("Table III: Recall@GT, human-curated data",
        Seq("method", "magellan", "ing#1", "ing#2"), rows))
    } finally spark.stop()
  }
}
