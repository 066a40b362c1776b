package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Experiments

/** spark-submit entrypoint reproducing Experiment 2: Tables VII and VIII
  * (Advogato, #RPQs ∈ {1, 2, 4, 6, 8, 10}).
  */
object Exp2Job {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.build("exp2")
    val rows = Experiments.runExp2()
    println(Experiments.renderTable7(rows))
    println(Experiments.renderTable8(rows))
    spark.stop()
  }
}
