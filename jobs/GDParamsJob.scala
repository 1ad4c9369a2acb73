package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** spark-submit entrypoint for §4.3: Figure 8 (step size), Figure 9
  * (adaptive step / vertex fixing), Figure 10 (projection methods).
  */
object GDParamsJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("gdparams").getOrCreate()
    Experiments.stepSizeSweep()
    Experiments.adaptiveComparison()
    Experiments.projectionComparison()
    spark.stop()
  }
}
