package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** spark-submit entrypoint for Table 1 (PR runtime & communication per
  * worker under the four partitioning policies). Args: [scale] [k].
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("table1").getOrCreate()
    val scale = if (args.length > 0) args(0).toInt else 15
    val k = if (args.length > 1) args(1).toInt else 16
    Experiments.table1(scale, k)
    spark.stop()
  }
}
