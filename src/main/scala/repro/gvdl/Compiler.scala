package repro.gvdl

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._
import Ast._

/** Compiles GVDL predicate ASTs to Catalyst [[Column]] expressions over a
  * graph's resolved edge frame (see [[repro.graph.PropertyGraph.resolved]]),
  * where endpoint properties appear as `src_&lt;p&gt;` / `dst_&lt;p&gt;`
  * columns. This is the Spark analog of the paper's TD join+filter dataflow
  * for view creation: the join is the `resolved` frame, the filter is the
  * compiled Column.
  */
object Compiler {

  /** Compile a predicate for the resolved edge frame. */
  def edgePredicate(e: Expr): Column = e match {
    case PropRef(SrcT, p)  => col(s"src_$p")
    case PropRef(DstT, p)  => col(s"dst_$p")
    case PropRef(EdgeT, p) => col(p)
    case NumLit(v)         => if (v == v.toLong) lit(v.toLong) else lit(v)
    case StrLit(v)         => lit(v)
    case BoolLit(v)        => lit(v)
    case Cmp(op, l, r)     => cmp(op, edgePredicate(l), edgePredicate(r))
    case And(l, r)         => edgePredicate(l) && edgePredicate(r)
    case Or(l, r)          => edgePredicate(l) || edgePredicate(r)
    case Not(x)            => !edgePredicate(x)
  }

  /** Compile a node-level predicate (aggregate views): refs must be bare
    * node properties.
    */
  def nodePredicate(e: Expr): Column = e match {
    case PropRef(EdgeT, p) => col(p)
    case PropRef(t, p) =>
      throw new IllegalArgumentException(
        s"node predicate cannot reference $t.$p — use bare property names")
    case NumLit(v)     => if (v == v.toLong) lit(v.toLong) else lit(v)
    case StrLit(v)     => lit(v)
    case BoolLit(v)    => lit(v)
    case Cmp(op, l, r) => cmp(op, nodePredicate(l), nodePredicate(r))
    case And(l, r)     => nodePredicate(l) && nodePredicate(r)
    case Or(l, r)      => nodePredicate(l) || nodePredicate(r)
    case Not(x)        => !nodePredicate(x)
  }

  private def cmp(op: String, l: Column, r: Column): Column = op match {
    case "="  => l === r
    case "!=" => l =!= r
    case "<"  => l < r
    case "<=" => l <= r
    case ">"  => l > r
    case ">=" => l >= r
    case o    => throw new IllegalArgumentException(s"unknown comparison '$o'")
  }

  /** Compile an aggregate spec to a Spark aggregation Column. */
  def aggregate(a: AggSpec): Column = {
    val c = a.fn match {
      case "count" => a.arg.map(x => count(col(x))).getOrElse(count(lit(1)))
      case "sum"   => sum(col(a.arg.get))
      case "min"   => min(col(a.arg.get))
      case "max"   => max(col(a.arg.get))
      case "avg"   => avg(col(a.arg.get))
    }
    c.as(a.alias)
  }
}
