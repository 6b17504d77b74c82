package repro.jobs

import org.apache.spark.sql.SparkSession

/** spark-submit entrypoint reproducing Table 3.
  *
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar
  * Scale via REPRO_BENCH_SCALE (default 1.0).
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("graphsurge-table3")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    repro.bench.Table3.run(spark).foreach(println)
    spark.stop()
  }
}
