package repro.diff

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Shared plumbing for the scratch and differential executors. */
object Engine {

  /** Re-alias every column (fresh exprIds). Iterative plans repeatedly
    * join frames descending from the same scan; without fresh attribute
    * ids Spark's analyzer trips over ambiguous self-join references.
    */
  def fresh(df: DataFrame): DataFrame =
    df.select(df.columns.map(c => col(c).as(c)).toSeq: _*)

  /** Eagerly materialize a frame and rebuild it from the cached RDD — the
    * only safe way to carry a frame across loop iterations here.
    *
    * `localCheckpoint` is NOT used because its `LogicalRDD` inherits the
    * origin Dataset's statistics: with iterated join plans the estimated
    * `sizeInBytes` compounds multiplicatively across iterations into
    * BigIntegers with millions of digits, and the planner then spends
    * minutes inside `SizeInBytesOnlyStatsPlanVisitor`. Rebuilding via
    * `createDataFrame(rdd, schema)` resets the leaf to default statistics,
    * keeping every iteration's plan-size estimate bounded. It also assigns
    * fresh attribute ids, avoiding self-join ambiguity.
    */
  def ckpt(df: DataFrame): DataFrame = ckptCounted(df)._1

  /** [[ckpt]] that also returns the row count (free — materialization
    * already counts), saving one action per loop iteration.
    */
  def ckptCounted(df: DataFrame): (DataFrame, Long) = {
    val rdd = df.rdd
    // RDD-level localCheckpoint truncates the lineage on materialization —
    // without it the DAGScheduler re-walks an ever-growing ancestry graph
    // on every job, so iteration latency creeps up across views.
    rdd.localCheckpoint()
    val n = rdd.count()
    (df.sparkSession.createDataFrame(rdd, df.schema), n)
  }

  /** Result of running a program on one view.
    *
    * @param finalState converged `vid, value` frame
    * @param trace      per-iteration change-points `vid, iter, value` —
    *                   the DD difference representation of the iteration
    *                   sequence (iteration-0 inits are implicit: they are
    *                   computable from `initExpr`)
    * @param lastIter   largest iteration with any change (trace horizon)
    * @param iterations number of iterations actually executed
    * @param workRows   Σ over executed iterations of recomputed-vertex
    *                   counts — the "computation footprint touched", used
    *                   by tests to prove sharing happens
    */
  final case class RunResult(finalState: DataFrame, trace: DataFrame,
                             lastIter: Int, iterations: Int, workRows: Long)

  /** Edges prepared for a program: symmetrized when undirected (directed
    * eids e map to 2e / 2e+1 so diffs stay keyed), with a `srcdeg` column
    * when degree-dependent.
    */
  def prepare(program: VertexProgram, edges: DataFrame): DataFrame = {
    val base =
      if (!program.undirected) edges.select(col("eid") * 2, col("src"), col("dst"), col("weight"))
        .toDF("eid", "src", "dst", "weight")
      else
        edges.select((col("eid") * 2).as("eid"), col("src"), col("dst"), col("weight"))
          .unionByName(
            edges.select((col("eid") * 2 + 1).as("eid"), col("dst").as("src"),
                         col("src").as("dst"), col("weight")))
    if (!program.degreeDependent) base.withColumn("srcdeg", lit(1L))
    else {
      val deg = base.groupBy(col("src").as("__dv")).agg(count(lit(1)).as("srcdeg"))
      base.join(deg, base("src") === deg("__dv"), "left")
        .drop("__dv")
        .withColumn("srcdeg", coalesce(col("srcdeg"), lit(1L)))
    }
  }

  /** Prepare a difference set the same way (keeps the `diff` column; no
    * degree column — diffs only seed affected sets).
    */
  def prepareDelta(program: VertexProgram, delta: DataFrame): DataFrame =
    if (!program.undirected)
      delta.select((col("eid") * 2).as("eid"), col("src"), col("dst"),
                   col("weight"), col("diff"))
    else
      delta.select((col("eid") * 2).as("eid"), col("src"), col("dst"),
                   col("weight"), col("diff"))
        .unionByName(
          delta.select((col("eid") * 2 + 1).as("eid"), col("dst").as("src"),
                       col("src").as("dst"), col("weight"), col("diff")))

  /** state_0. */
  def initialState(program: VertexProgram, vertices: DataFrame): DataFrame =
    vertices.select(col("vid"), program.initExpr(col("vid")).cast("double").as("value"))

  /** An empty `vid, iter, value` trace. */
  def emptyTrace(spark: SparkSession): DataFrame = {
    import org.apache.spark.sql.types._
    spark.createDataFrame(
      spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
      StructType(Seq(StructField("vid", LongType), StructField("iter", IntegerType),
                     StructField("value", DoubleType))))
  }

  /** An empty `vid, value` state. */
  def emptyState(spark: SparkSession): DataFrame = {
    import org.apache.spark.sql.types._
    spark.createDataFrame(
      spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
      StructType(Seq(StructField("vid", LongType), StructField("value", DoubleType))))
  }

  /** Stored states of the vertices in `s` at iterations `j` and `j-1` in a
    * single trace pass: returns `vid, __sc` (value at j), `__sp` (value at
    * j-1), falling back to init. The `-1` ordering sentinel keeps `max_by`
    * away from null ordering values.
    */
  def storedPairAt(program: VertexProgram, trace: DataFrame, s: DataFrame,
                   j: Int): DataFrame = {
    val hits = fresh(
      trace
        .where(col("iter") <= j)
        .join(broadcast(fresh(s.select("vid"))), Seq("vid"))
        .groupBy("vid")
        .agg(
          max_by(col("value"), col("iter")).as("__tc"),
          max_by(when(col("iter") <= j - 1, col("value")),
                 coalesce(when(col("iter") <= j - 1, col("iter")), lit(-1))).as("__tp")))
    fresh(
      fresh(s.select("vid"))
        .join(broadcast(hits), Seq("vid"), "left")
        .select(col("vid"),
                coalesce(col("__tc"), program.initExpr(col("vid")).cast("double")).as("__sc"),
                coalesce(col("__tp"), program.initExpr(col("vid")).cast("double")).as("__sp")))
  }

  /** Stored state of the vertices in `s` at iteration `j`: latest trace
    * change ≤ j, falling back to init. `s` must have a `vid` column and is
    * assumed small (it is broadcast).
    */
  def storedValueAt(program: VertexProgram, trace: DataFrame, s: DataFrame,
                    j: Int): DataFrame = {
    val hits = fresh(
      trace
        .where(col("iter") <= j)
        .join(broadcast(fresh(s.select("vid"))), Seq("vid"))
        .groupBy("vid")
        .agg(max_by(col("value"), col("iter")).as("__tv")))
    fresh(
      fresh(s.select("vid"))
        .join(broadcast(hits), Seq("vid"), "left")
        .select(col("vid"),
                coalesce(col("__tv"), program.initExpr(col("vid")).cast("double")).as("value")))
  }
}
