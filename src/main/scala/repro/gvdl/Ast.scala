package repro.gvdl

/** Abstract syntax for GVDL (§3.1, §3.2, §6).
  *
  * Predicates reference edge properties bare (`duration`), and endpoint
  * properties qualified (`src.state`, `dst.city`), exactly as in the
  * paper's Listings 1 and 3.
  */
object Ast {

  /** Where a property reference resolves. */
  sealed trait Target
  case object SrcT  extends Target
  case object DstT  extends Target
  case object EdgeT extends Target

  sealed trait Expr
  final case class PropRef(target: Target, name: String) extends Expr
  final case class NumLit(v: Double)                     extends Expr
  final case class StrLit(v: String)                     extends Expr
  final case class BoolLit(v: Boolean)                   extends Expr
  final case class Cmp(op: String, l: Expr, r: Expr)     extends Expr
  final case class And(l: Expr, r: Expr)                 extends Expr
  final case class Or(l: Expr, r: Expr)                  extends Expr
  final case class Not(e: Expr)                          extends Expr

  /** One aggregate in an aggregate-view definition, e.g. `sum(duration) as
    * total-duration`. `arg = None` means `count(*)`.
    */
  final case class AggSpec(fn: String, arg: Option[String], alias: String)

  sealed trait Stmt
  /** `create view NAME on GRAPH edges where <pred>` (Listing 1). */
  final case class CreateView(name: String, graph: String, where: Expr) extends Stmt
  /** `create view collection NAME on GRAPH [v: pred], ...` (Listing 3). */
  final case class CreateViewCollection(name: String, graph: String,
                                        views: Seq[(String, Expr)]) extends Stmt
  /** `create aggregate view NAME on GRAPH [nodes where <pred>] nodes group
    * by p1, p2 [nodes aggregate f(x) as a, ...] [edges aggregate ...]`
    * (Listing 4 semantics).
    */
  final case class CreateAggView(name: String, graph: String,
                                 nodeWhere: Option[Expr],
                                 groupBy: Seq[String],
                                 nodeAggs: Seq[AggSpec],
                                 edgeAggs: Seq[AggSpec]) extends Stmt
}
