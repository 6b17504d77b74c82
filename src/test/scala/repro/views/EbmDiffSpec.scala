package repro.views

import org.apache.spark.sql.functions._
import repro.{Oracle, ReproSpec}
import repro.graph.GraphGen
import repro.gvdl.Parser

/** EBM (§3.2 step 1) and difference-stream (§3.2 step 3) semantics. */
class EbmDiffSpec extends ReproSpec {

  private lazy val graph = GraphGen.callGraph(spark, nV = 100, nE = 700)
  private val predTexts = Seq(
    "duration <= 5", "duration <= 12", "duration <= 20",
    "year <= 2013", "year <= 2016 and duration <= 20")
  private lazy val preds = predTexts.map(Parser.parsePredicate)
  private lazy val ebm = Ebm.compute(graph, preds).localCheckpoint(true)

  test("EBM has one row per edge with packed bits") {
    assert(ebm.count() == graph.edges.count())
    assert(ebm.select("bits").head.getSeq[Long](0).size == 1)
  }

  for ((p, j) <- predTexts.zipWithIndex) {
    test(s"EBM column $j matches direct predicate count ('$p')") {
      val direct = graph.resolved
        .where(repro.gvdl.Compiler.edgePredicate(preds(j))).count()
      assert(Ebm.viewEdges(ebm, j).count() == direct)
    }
  }

  test("EBM view membership agrees with DuckDB per edge") {
    val flat = graph.resolved.select("eid", "duration", "year")
    val got = Ebm.viewEdges(ebm, 0).select(col("eid").cast("string").as("eid"))
    Oracle.assertEquivalent(got,
      "SELECT eid FROM edges WHERE CAST(duration AS INT) <= 5", "edges" -> flat)
  }

  test("viewSizes matches per-view counts") {
    val sizes = Ebm.viewSizes(ebm, predTexts.size)
    for (j <- predTexts.indices)
      assert(sizes(j) == Ebm.viewEdges(ebm, j).count())
  }

  test("difference stream reconstitutes every view (Σ_{s≤t} δC_s = GV_t)") {
    val order = 0 until predTexts.size
    val diffs = DiffStream.compute(ebm, order).localCheckpoint(true)
    for (t <- order) {
      val folded = diffs.where(col("t") <= t)
        .groupBy("eid").agg(sum("diff").as("m"))
        .where(col("m") > 0)
      assert(folded.count() == Ebm.viewEdges(ebm, t).count(), s"view $t size")
      // Exactly the same edge set, not just the same size.
      val mismatch = folded.select("eid")
        .join(Ebm.viewEdges(ebm, t).select(col("eid").as("eid2")),
              col("eid") === col("eid2"), "full_outer")
        .where(col("eid").isNull || col("eid2").isNull)
        .count()
      assert(mismatch == 0, s"view $t membership")
    }
  }

  test("diff multiplicities are only +1/-1 and first occurrence is +1") {
    val diffs = DiffStream.compute(ebm, 0 until predTexts.size)
    assert(diffs.where(abs(col("diff")) =!= 1).count() == 0)
    val firsts = diffs.groupBy("eid").agg(min_by(col("diff"), col("t")).as("first"))
    assert(firsts.where(col("first") =!= 1).count() == 0)
  }

  test("countDiffs equals materialized stream length for any order") {
    val order = Seq(3, 0, 4, 1, 2)
    val n = DiffStream.countDiffs(ebm, order)
    assert(n == DiffStream.compute(ebm, order).count())
  }

  test("inclusion-chain order yields fewer diffs than a bad order") {
    // duration<=5 ⊂ duration<=12 ⊂ duration<=20: the chain order only adds.
    val chain = DiffStream.countDiffs(ebm, Seq(0, 1, 2))
    val bad   = DiffStream.countDiffs(ebm, Seq(0, 2, 1))
    assert(chain <= bad)
  }

  test("paper worked example: row (1110) has 1 block but 2 diffs") {
    import spark.implicits._
    val df = Seq((1L, 1, 1, 1, 0)).toDF("eid", "a", "b", "c", "d")
    val packed = Ebm.fromBoolColumns(df,
      Seq(col("a") === 1, col("b") === 1, col("c") === 1, col("d") === 1))
    assert(DiffStream.countDiffs(packed, 0 until 4) == 2)
  }

  test("Figure 5 example matrix produces the paper's difference stream") {
    import spark.implicits._
    // Rows e0..e4 over views GV1..GV3 (Figure 5a).
    val rows = Seq(
      (0L, 1, 0, 0), (1L, 1, 0, 1), (2L, 0, 0, 1), (3L, 0, 1, 1), (4L, 1, 1, 1))
    val df = rows.toDF("eid", "v1", "v2", "v3")
      .withColumn("src", col("eid")).withColumn("dst", col("eid") + 1)
    val packed = Ebm.fromBoolColumns(df,
      Seq(col("v1") === 1, col("v2") === 1, col("v3") === 1))
    val diffs = DiffStream.compute(packed, Seq(0, 1, 2))
      .select("eid", "t", "diff").collect()
      .map(r => (r.getLong(0), r.getInt(1), r.getInt(2))).toSet
    val expected = Set(
      (0L, 0, 1), (0L, 1, -1),
      (1L, 0, 1), (1L, 1, -1), (1L, 2, 1),
      (2L, 2, 1),
      (3L, 1, 1),
      (4L, 0, 1))
    assert(diffs == expected)
  }
}
