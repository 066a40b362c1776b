package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.Datasets
import repro.harness.Experiments

/** spark-submit entrypoint reproducing Table IV (dataset statistics). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.build("table4")
    val stats = Datasets.all.map { spec =>
      val g = spec.load(spark)
      (spec, g.numVertices, g.numEdges, g.labels.size)
    }
    println(Experiments.renderTable4(stats))
    spark.stop()
  }
}
