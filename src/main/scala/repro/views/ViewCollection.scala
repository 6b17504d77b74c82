package repro.views

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.PropertyGraph
import repro.gvdl.{Ast, Parser}
import repro.ordering.CollectionOrderer

/** A materialized view collection (§3.2): views organized as a single
  * timestamped edge-difference stream.
  *
  * @param name        collection name
  * @param viewNames   view names in *execution* order (after ordering)
  * @param order       σ: execution position → original view index
  * @param diffs       difference stream `t, eid, src, dst, weight, diff`
  * @param numViews    k
  * @param totalDiffs  Σ_t |δC_t| (the COP objective value of `order`)
  * @param ebm         the packed edge boolean matrix, when built from
  *                    predicates (absent for explicit-diff collections)
  * @param cct         collection creation time breakdown, milliseconds
  */
final case class ViewCollection(
    name: String,
    viewNames: Seq[String],
    order: Seq[Int],
    diffs: DataFrame,
    numViews: Int,
    totalDiffs: Long,
    ebm: Option[DataFrame],
    cct: ViewCollection.Cct) {

  /** Difference set fed to the engine when advancing to position t. */
  def diffsAt(t: Int): DataFrame = DiffStream.at(diffs, t)

  /** Materialize the view at execution position t (for tests/scratch). */
  def viewEdges(t: Int): DataFrame = ebm match {
    case Some(m) => Ebm.viewEdges(m, order(t))
    case None =>
      // Fold the difference stream up to t — Σ_{s<=t} δC_s.
      diffs.where(col("t") <= t)
        .groupBy("eid", "src", "dst", "weight")
        .agg(sum("diff").as("m"))
        .where(col("m") > 0)
        .select("eid", "src", "dst", "weight")
  }
}

object ViewCollection {

  /** CCT breakdown: EBM computation, ordering, diff-stream materialization. */
  final case class Cct(ebmMs: Long, orderMs: Long, diffMs: Long) {
    def totalMs: Long = ebmMs + orderMs + diffMs
  }

  /** How to order the views before building the difference stream. */
  sealed trait OrderStrategy
  /** Keep the user-given order (e.g. inclusion chains like D1..D34). */
  case object GivenOrder extends OrderStrategy
  /** Algorithm 1 (Hamming clique + TSP heuristic). */
  case object GraphsurgeOrder extends OrderStrategy
  /** Seeded random order (Table 4 baseline). */
  final case class RandomOrder(seed: Long) extends OrderStrategy

  /** Build a collection from named predicates (§3.2 steps 1–3). */
  def build(graph: PropertyGraph, name: String,
            views: Seq[(String, Ast.Expr)],
            strategy: OrderStrategy = GivenOrder): ViewCollection = {
    val k = views.size
    require(k >= 1, "a view collection needs at least one view")

    val t0  = System.nanoTime()
    val ebm = Ebm.compute(graph, views.map(_._2)).transform(repro.diff.Engine.ckpt)
    val t1  = System.nanoTime()

    val order = strategy match {
      case GivenOrder        => 0 until k
      case RandomOrder(seed) => CollectionOrderer.randomOrder(k, seed)
      case GraphsurgeOrder   => CollectionOrderer.order(ebm, k).order
    }
    val t2 = System.nanoTime()

    val diffs = DiffStream.compute(ebm, order).transform(repro.diff.Engine.ckpt)
    val total = diffs.count()
    val t3    = System.nanoTime()

    ViewCollection(
      name, order.map(views(_)._1), order, diffs, k, total, Some(ebm),
      Cct((t1 - t0) / 1000000, (t2 - t1) / 1000000, (t3 - t2) / 1000000))
  }

  /** Build from a GVDL `create view collection` statement. */
  def fromGvdl(graph: PropertyGraph, gvdl: String,
               strategy: OrderStrategy = GivenOrder): ViewCollection =
    Parser.parse(gvdl) match {
      case Ast.CreateViewCollection(name, _, views) => build(graph, name, views, strategy)
      case other =>
        throw new IllegalArgumentException(s"not a view-collection statement: $other")
    }

  /** Build a collection directly from explicit per-view difference sets
    * (the §5 controlled experiment / Table 2 construction: artificial
    * collections made by random edge additions/removals). `perView(t)`
    * must carry columns eid, src, dst, weight, diff.
    */
  def fromExplicitDiffs(spark: SparkSession, name: String,
                        perView: Seq[DataFrame]): ViewCollection = {
    val t0 = System.nanoTime()
    val stream = perView.zipWithIndex
      .map { case (df, t) =>
        df.select(lit(t).as("t"), col("eid"), col("src"), col("dst"),
                  coalesce(col("weight"), lit(1.0)).as("weight"), col("diff"))
      }
      .reduce(_ unionByName _)
      .transform(repro.diff.Engine.ckpt)
    val total = stream.count()
    val t1 = System.nanoTime()
    ViewCollection(
      name, perView.indices.map(t => s"v$t"), perView.indices,
      stream, perView.size, total, None, Cct(0, 0, (t1 - t0) / 1000000))
  }
}
