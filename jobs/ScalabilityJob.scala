package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** spark-submit entrypoint for Figure 11 (DistGD wall-clock vs graph size).
  * Args: [comma-separated RMAT scales] [iterations].
  */
object ScalabilityJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("scalability")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    val scales = if (args.length > 0) args(0).split(",").map(_.toInt).toSeq else Seq(13, 14, 15, 16)
    val iters = if (args.length > 1) args(1).toInt else 30
    Experiments.scalability(spark, scales, iters)
    spark.stop()
  }
}
