package repro.bench

import org.apache.spark.sql.SparkSession
import repro.algorithms.{PageRankProg, Sssp}
import repro.diff.CollectionExecutor
import repro.graph.GraphGen

/** Table 2 (§5): Bellman-Ford and PageRank, diff-only vs scratch, on an
  * Orkut-analog random digraph with two artificial perturbation
  * collections — one with tiny difference sets, one with huge ones.
  *
  * Paper setup: 10M Orkut edges, 20 views, C_1K = ±500 edges/view,
  * C_3.5M = +2M/−1.5M edges/view. This repro (scale 1.0): 150K edges,
  * 10 views, C_small = ±150 (0.1%, like C_1K's 0.005% — small), C_large =
  * +30K/−22.5K (the paper's +20%/−15% fractions exactly).
  */
object Table2 {

  final case class Cell(coll: String, algo: String, diffMs: Long, scratchMs: Long)

  def run(spark: SparkSession): Seq[String] = {
    BenchUtil.configure(spark)
    val s  = BenchUtil.scale
    val nV = math.max(100L, (20000 * s).toLong)
    val nE = math.max(500L, (100000 * s).toLong)
    val views = 8
    val g = GraphGen.randomGraph(spark, nV, nE)
    val edges = repro.diff.Engine.ckpt(g.topology)
    val src = BenchUtil.firstSource(edges)
    val verts = g.vertexIds

    val cSmall = BenchUtil.perturbationCollection(spark, "C-small", edges, nV, views,
      addN = math.max(5, (150 * s).toInt), delN = math.max(5, (150 * s).toInt), seed = 101)
    val cLarge = BenchUtil.perturbationCollection(spark, "C-large", edges, nV, views,
      addN = (nE * 0.20).toInt, delN = (nE * 0.15).toInt, seed = 202)

    val cells = for {
      (cName, coll) <- Seq("small" -> cSmall, "large" -> cLarge)
      (aName, prog) <- Seq("BF" -> Sssp(src), "PR" -> PageRankProg(10))
    } yield {
      val d = CollectionExecutor.run(spark, prog, verts, coll, CollectionExecutor.DiffOnly)
      val c = CollectionExecutor.run(spark, prog, verts, coll, CollectionExecutor.ScratchOnly)
      Cell(cName, aName, d.totalMillis, c.totalMillis)
    }

    val header = Seq(
      "== Table 2: diff-only vs scratch on perturbation collections ==",
      f"graph: |V|=$nV |E|=$nE views=$views (paper: Orkut 10M edges, 20 views)",
      f"${"coll"}%-8s ${"algo"}%-5s ${"diff-only"}%10s ${"scratch"}%10s   paper (diff, scratch)")
    val paper = Map(
      ("small", "BF") -> "1.4s, 13.5s", ("small", "PR") -> "66.5s, 136.2s",
      ("large", "BF") -> "13.0s, 25.7s", ("large", "PR") -> "281.9s, 193.2s")
    header ++ cells.map { c =>
      f"${c.coll}%-8s ${c.algo}%-5s ${BenchUtil.fmtMs(c.diffMs)}%10s ${BenchUtil.fmtMs(c.scratchMs)}%10s   ${paper((c.coll, c.algo))}"
    }
  }
}
