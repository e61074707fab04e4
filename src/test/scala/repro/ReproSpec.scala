package repro

/** Base for this repo's suites: tiny graphs don't need 64 shuffle partitions,
  * so dial them down for round-trip latency (iterative algorithms launch a
  * few Spark jobs per round).
  */
trait ReproSpec extends SparkSpec {
  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "4")
  }
}
