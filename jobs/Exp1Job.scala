package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Experiments

/** spark-submit entrypoint reproducing Experiment 1: Tables V and VI and
  * the shared-data sizes of Fig. 11 (4 datasets, #RPQs = 4).
  */
object Exp1Job {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.build("exp1")
    val rows = Experiments.runExp1()
    println(Experiments.renderTable5(rows))
    println(Experiments.renderTable6(rows))
    println(Experiments.renderFig11(rows))
    spark.stop()
  }
}
