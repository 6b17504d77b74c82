package repro.diff

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** An iterative graph analytics program in Jacobi vertex-centric form —
  * the repo's analog of the paper's `graph_analytics` DD programs
  * (Listing 2).
  *
  * Semantics per iteration i ≥ 1 over the current view's edges E:
  * {{{
  *   state_i(v) = apply( init(v),
  *                       AGG_{(u,v) ∈ E} msg(state_{i-1}(u), w(u,v), deg(u)) )
  * }}}
  * with `state_0 = init`. The Jacobi form (a vertex's new value depends on
  * its neighbors' previous values and its own *initial* value, never its own
  * previous value) is what makes differential replay correct under edge
  * deletions: an affected vertex recomputed from its current in-neighborhood
  * can move in either direction.
  *
  * All hooks are Catalyst [[Column]] expressions, so both the scratch and
  * differential executors stay entirely inside Spark SQL.
  */
trait VertexProgram {
  def name: String

  /** state_0 and the apply() base for a vertex id column. */
  def initExpr(vid: Column): Column

  /** Message along an edge; `srcDeg` is the source's out-degree in the
    * current view (only meaningful when [[degreeDependent]]).
    */
  def msgExpr(srcValue: Column, weight: Column, srcDeg: Column): Column

  /** True → min-aggregation, false → sum-aggregation of messages. */
  def aggIsMin: Boolean

  /** Combine init with the aggregated messages; `agg` is null for a vertex
    * with no in-edges.
    */
  def applyExpr(init: Column, agg: Column): Column

  /** Messages depend on the source's out-degree (PageRank): an edge diff at
    * u perturbs *all* of u's messages — the instability §5 discusses.
    */
  def degreeDependent: Boolean = false

  /** Propagate along both edge directions (WCC). */
  def undirected: Boolean = false

  /** Some(k): run exactly k iterations (PageRank); None: to fixpoint. */
  def fixedIterations: Option[Int] = None

  /** Safety cap for fixpoint programs. */
  def maxIterations: Int = 500

  /** Aggregation column. */
  final def aggColumn(c: Column): Column = if (aggIsMin) min(c) else sum(c)
}

object VertexProgram {
  /** Value-inequality with a tolerance, null-safe, ∞-safe: the predicate
    * that defines trace change-points and differential divergence.
    */
  def neq(a: Column, b: Column): Column = {
    val bothNull = a.isNull && b.isNull
    val oneNull  = a.isNull =!= b.isNull
    val bothInf  = a === Double.PositiveInfinity && b === Double.PositiveInfinity
    oneNull || (!bothNull && !bothInf && abs(a - b) > lit(1e-9))
  }
}
