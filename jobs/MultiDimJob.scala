package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** spark-submit entrypoint for the §4.1 quality experiments:
  * Figure 4 (imbalance), Figures 5/6 (locality), and the 4-dim runs.
  */
object MultiDimJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("multidim").getOrCreate()
    Experiments.imbalanceTable()
    Experiments.figure5()
    Experiments.figure6()
    Experiments.fourDim()
    spark.stop()
  }
}
