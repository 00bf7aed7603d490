package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Experiments

/** spark-submit entrypoint regenerating Table IV: average runtime per
  * experiment (seconds) per matching method.
  *
  * Usage: spark-submit --class repro.jobs.RunEfficiency <jar> [rows] [cap]
  */
object RunEfficiency {
  def main(args: Array[String]): Unit = {
    val rows = args.lift(0).map(_.toLong).getOrElse(Experiments.BenchRows)
    val cap = args.lift(1).map(_.toInt).getOrElse(Experiments.BenchCap)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("valentine-efficiency")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val t4 = Experiments.tableIV(spark, rows, cap)
      val rowsOut = t4.toSeq.sortBy(_._2).map { case (f, ms) =>
        Seq(f, f"${ms / 1000.0}%.2f")
      }
      println(Experiments.render("Table IV: average runtime per experiment (s)",
        Seq("method", "avg runtime (s)"), rowsOut))
    } finally spark.stop()
  }
}
