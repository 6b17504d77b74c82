package repro.bench

import org.apache.spark.sql.SparkSession
import repro.graph.{GraphGen, PropertyGraph}
import repro.gvdl.Ast
import repro.views.ViewCollection

/** Table 4 (§7.4): number of difference-set entries and collection
  * creation time (CCT) for the Graphsurge ordering vs three random
  * orderings, on community-removal view collections ¹⁰C₅ (252 views) and
  * ⁷C₄ (35 views), over LiveJournal- and wiki-topcats-analog graphs.
  *
  * Each view removes one k-subset of the top-N ground-truth communities
  * (every edge incident to a removed community's nodes disappears) — the
  * perturbation-analysis application where no good manual order exists.
  */
object Table4 {

  /** Predicate: keep an edge iff neither endpoint is in a removed community. */
  private def removalPredicate(removed: Seq[Int]): Ast.Expr = {
    import Ast._
    removed.map[Expr] { c =>
      And(Cmp("!=", PropRef(SrcT, "comm"), NumLit(c)),
          Cmp("!=", PropRef(DstT, "comm"), NumLit(c)))
    }.reduce((a, b) => And(a, b))
  }

  /** All C(n,k) sorted k-subsets of 0..n-1. */
  def subsets(n: Int, k: Int): Seq[Seq[Int]] =
    (0 until n).combinations(k).map(_.toSeq).toSeq

  def views(n: Int, k: Int): Seq[(String, Ast.Expr)] =
    subsets(n, k).map(s => (s.mkString("-"), removalPredicate(s)))

  private def dataset(spark: SparkSession, name: String, nV: Long, nE: Long)
      : (String, PropertyGraph) = {
    val g = GraphGen.communityGraph(spark, nV, nE, nComm = 12)
    g.resolved.localCheckpoint(true)
    (name, g)
  }

  def run(spark: SparkSession): Seq[String] = {
    BenchUtil.configure(spark)
    // A 252-view EBM is one projection with ~5000 sub-expressions;
    // whole-stage codegen exceeds janino's limits, and Spark 4 surfaces
    // that as an internal error instead of falling back — run this table
    // with whole-stage compilation off.
    val wscg = spark.conf.get("spark.sql.codegen.wholeStage", "true")
    spark.conf.set("spark.sql.codegen.wholeStage", "false")
    try runInner(spark)
    finally spark.conf.set("spark.sql.codegen.wholeStage", wscg)
  }

  private def runInner(spark: SparkSession): Seq[String] = {
    val s = BenchUtil.scale
    val datasets = Seq(
      dataset(spark, "LJ-analog", (12000 * s).toLong max 500, (90000 * s).toLong max 2000),
      dataset(spark, "WTC-analog", (6000 * s).toLong max 300, (45000 * s).toLong max 1000))
    val configs = Seq(("10C5", 10, 5), ("7C4", 7, 4))

    val out = Seq.newBuilder[String]
    out += "== Table 4: collection ordering — #Diffs and creation time (CCT) =="
    for ((dName, g) <- datasets; (cName, n, k) <- configs) {
      val vs = views(n, k)
      val strategies = Seq(
        "Ord." -> ViewCollection.GraphsurgeOrder,
        "R1" -> ViewCollection.RandomOrder(1),
        "R2" -> ViewCollection.RandomOrder(2),
        "R3" -> ViewCollection.RandomOrder(3))
      val built = strategies.map { case (sn, strat) =>
        (sn, ViewCollection.build(g, s"$dName-$cName-$sn", vs, strat))
      }
      val ordDiffs = built.head._2.totalDiffs.toDouble
      val ordCct   = built.head._2.cct.totalMs.toDouble
      out += f"-- $dName $cName (${vs.size} views, |E|=${g.numEdges}) --"
      out += "   " + built.map { case (sn, c) =>
        f"$sn: diffs=${c.totalDiffs}%,d (${c.totalDiffs / ordDiffs}%.1fx)"
      }.mkString("  ")
      out += "   " + built.map { case (sn, c) =>
        f"$sn: cct=${BenchUtil.fmtMs(c.cct.totalMs)} (${c.cct.totalMs / math.max(1.0, ordCct)}%.2fx)"
      }.mkString("  ")
    }
    out += "paper: LJ 10C5 Ord 157M vs R 1.4-1.6B (9.5-10.3x); LJ 7C4 Ord 63M vs ~4x;"
    out += "       WTC 10C5 Ord 72M vs 1.0-1.2B (14.2-16.8x); WTC 7C4 Ord 45M vs 3.5x;"
    out += "       CCT overhead of ordering: 1.1x-1.7x over random (which skips the TSP step)"
    out.result()
  }
}
