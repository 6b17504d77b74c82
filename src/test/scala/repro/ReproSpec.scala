package repro

/** Base trait for this repo's suites: SparkSpec plus low shuffle
  * parallelism — the unit-test graphs are tiny, and 64 shuffle partitions
  * per iteration would make the iterative engines latency-bound.
  */
trait ReproSpec extends SparkSpec {
  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "1")
    // AQE re-plans every stage; on sub-second iterative jobs that planning
    // latency dominates, so turn it off for the unit suites.
    spark.conf.set("spark.sql.adaptive.enabled", "false")
  }
}
