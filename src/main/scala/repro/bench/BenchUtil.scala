package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.diff.Engine
import repro.views.ViewCollection

/** Shared plumbing for the table harnesses. */
object BenchUtil {

  /** Bench scale knob: 1.0 = the defaults documented in DESIGN.md §6.
    * Override with REPRO_BENCH_SCALE.
    */
  def scale: Double = sys.env.get("REPRO_BENCH_SCALE").map(_.toDouble).getOrElse(1.0)

  def configure(spark: SparkSession): Unit = {
    spark.conf.set("spark.sql.shuffle.partitions", "4")
    spark.conf.set("spark.sql.adaptive.enabled", "false")
  }

  /** First vertex with an outgoing edge — the paper's BFS/MPSP source. */
  def firstSource(edges: DataFrame): Long =
    edges.agg(min(col("src"))).collect()(0).getLong(0)

  /** Build a §5-style artificial perturbation collection on Spark: view 0
    * is `edges`; each subsequent view removes `delN` pseudo-randomly chosen
    * edges and adds `addN` fresh random edges over `nV` vertices.
    */
  def perturbationCollection(spark: SparkSession, name: String, edges: DataFrame,
                             nV: Long, views: Int, addN: Int, delN: Int,
                             seed: Long): ViewCollection = {
    var current = Engine.ckpt(edges.select("eid", "src", "dst", "weight"))
    val perView = Seq.newBuilder[DataFrame]
    perView += current.withColumn("diff", lit(1))
    for (v <- 1 until views) {
      val dels = Engine.ckpt(
        current.orderBy(xxhash64(col("eid"), lit(seed + v))).limit(delN))
      val adds = Engine.ckpt(
        spark.range(addN).select(
          (lit(1000000L * v + seed * 100000000L) + col("id")).as("eid"),
          repro.graph.GraphGen.hu(col("id"), seed + 31 * v).multiply(nV).cast("long").as("src"),
          repro.graph.GraphGen.hu(col("id"), seed + 37 * v).multiply(nV).cast("long").as("dst"),
          lit(1.0).as("weight"))
          .where(col("src") =!= col("dst")))
      perView += adds.withColumn("diff", lit(1))
        .unionByName(dels.withColumn("diff", lit(-1)))
      current = Engine.ckpt(
        current.join(dels.select("eid"), Seq("eid"), "left_anti").unionByName(adds))
    }
    ViewCollection.fromExplicitDiffs(spark, name, perView.result())
  }

  def fmtMs(ms: Long): String = f"${ms / 1000.0}%.1fs"
}
