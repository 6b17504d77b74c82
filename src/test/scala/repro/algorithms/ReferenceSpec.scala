package repro.algorithms

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Cross-validation of the driver-side reference implementations against
  * each other's invariants — these are the oracles for the distributed
  * engine, so they get their own property checks.
  */
class ReferenceSpec extends AnyFunSuite {

  private def randomGraph(seed: Int, nV: Int, nE: Int): (Seq[Long], Seq[(Long, Long)]) = {
    val rnd = new Random(seed)
    val verts = (0L until nV).toSeq
    val edges = Seq.fill(nE) {
      val s = rnd.nextInt(nV); var d = rnd.nextInt(nV)
      while (d == s) d = rnd.nextInt(nV)
      (s.toLong, d.toLong)
    }
    (verts, edges)
  }

  for (seed <- 1 to 5) {
    test(s"BFS distances equal Bellman-Ford with unit weights (seed=$seed)") {
      val (v, e) = randomGraph(seed, 40, 120)
      val bfs = Reference.bfs(v, e, 0L)
      val bf  = Reference.bellmanFord(v, e.map { case (s, d) => (s, d, 1.0) }, 0L)
      assert(bfs == bf)
    }

    test(s"WCC labels are the minimum member of each class (seed=$seed)") {
      val (v, e) = randomGraph(seed + 10, 40, 80)
      val w = Reference.wcc(v, e)
      w.groupBy(_._2).foreach { case (label, members) =>
        assert(members.keys.min.toDouble == label)
        assert(members.contains(label.toLong))
      }
    }

    test(s"SCC refines WCC: same SCC ⇒ same WCC (seed=$seed)") {
      val (v, e) = randomGraph(seed + 20, 30, 90)
      val scc = Reference.scc(v, e)
      val wcc = Reference.wcc(v, e)
      for (a <- v; b <- v if scc(a) == scc(b))
        assert(wcc(a) == wcc(b), s"$a,$b")
    }

    test(s"PageRank values are ≥ 0.15 and finite (seed=$seed)") {
      val (v, e) = randomGraph(seed + 30, 40, 120)
      val pr = Reference.pageRank(v, e, 10)
      pr.values.foreach(x => assert(x >= 0.15 - 1e-12 && x < 1e6))
    }

    test(s"BFS distances respect edge relaxation (seed=$seed)") {
      val (v, e) = randomGraph(seed + 40, 40, 120)
      val d = Reference.bfs(v, e, 0L)
      e.foreach { case (s, t) =>
        if (!d(s).isInfinity) assert(d(t) <= d(s) + 1)
      }
    }
  }

  test("Tarjan on a cycle is a single component") {
    val v = (0L until 5L).toSeq
    val e = v.map(i => (i, (i + 1) % 5))
    assert(Reference.scc(v, e).values.toSet == Set(0L))
  }

  test("Tarjan on a DAG gives singleton components") {
    val v = (0L until 6L).toSeq
    val e = Seq((0L, 1L), (1L, 2L), (0L, 3L), (3L, 4L), (4L, 5L), (2L, 5L))
    assert(Reference.scc(v, e) == v.map(x => x -> x).toMap)
  }

  test("union-find path compression keeps results stable under ordering") {
    val (v, e) = randomGraph(99, 50, 100)
    assert(Reference.wcc(v, e) == Reference.wcc(v, e.reverse))
  }
}
