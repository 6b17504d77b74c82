package repro.bench

import repro.SparkSpec

/** `sbt "bench/test"` harness for Table 2. */
class Table2Bench extends SparkSpec {
  test("Table 2: differential vs scratch on perturbation collections") {
    val rows = Table2.run(spark)
    rows.foreach(println)
    assert(rows.nonEmpty)
  }
}
