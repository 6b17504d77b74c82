package repro.jobs

import org.apache.spark.sql.SparkSession

/** spark-submit entrypoint reproducing Table 4.
  *
  * Usage: spark-submit --class repro.jobs.Table4Job repro.jar
  * Scale via REPRO_BENCH_SCALE (default 1.0).
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("graphsurge-table4")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    repro.bench.Table4.run(spark).foreach(println)
    spark.stop()
  }
}
