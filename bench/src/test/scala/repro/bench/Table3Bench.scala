package repro.bench

import repro.SparkSpec

/** `sbt "bench/test"` harness for Table 3. */
class Table3Bench extends SparkSpec {
  test("Table 3: adaptive splitting on citation collections") {
    val rows = Table3.run(spark)
    rows.foreach(println)
    assert(rows.nonEmpty)
  }
}
