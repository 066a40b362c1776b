package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession builder for job entrypoints — mirrors the test
  * configuration (broadcast joins disabled so shuffle paths are exercised).
  */
object JobSession {
  def build(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"repro-$app")
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      // Same workaround as SparkSpec: iterative self-unions of checkpointed
      // plans trip a Catalyst constraint-rewrite bug.
      .config("spark.sql.constraintPropagation.enabled", false)
      .config("spark.ui.enabled", false)
      .getOrCreate()
}
