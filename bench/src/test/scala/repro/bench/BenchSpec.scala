package repro.bench

import repro.SparkSpec

/** Base for benchmark suites: drops shuffle parallelism to match the
  * benchmark graph sizes (thousands of vertices — 64-partition shuffles
  * are pure scheduling overhead at this scale).
  */
trait BenchSpec extends SparkSpec {
  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions",
      sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"))
  }
}
