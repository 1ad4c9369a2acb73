package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** spark-submit entrypoint for Figure 7 (Giraph speedups over Hash for
  * PR/CC/HC/MF in vertex / edge / vertex-edge modes).
  */
object SpeedupJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("speedups").getOrCreate()
    Experiments.speedups()
    spark.stop()
  }
}
