package repro.jobs

import org.apache.spark.sql.SparkSession

/** spark-submit entrypoint reproducing Table 2.
  *
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar
  * Scale via REPRO_BENCH_SCALE (default 1.0).
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("graphsurge-table2")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    repro.bench.Table2.run(spark).foreach(println)
    spark.stop()
  }
}
