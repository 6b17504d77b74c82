package repro.bench

import repro.SparkSpec

/** `sbt "bench/test"` harness for Table 4. */
class Table4Bench extends SparkSpec {
  test("Table 4: collection ordering quality and creation time") {
    val rows = Table4.run(spark)
    rows.foreach(println)
    assert(rows.nonEmpty)
  }
}
