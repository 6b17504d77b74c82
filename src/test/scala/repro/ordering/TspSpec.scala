package repro.ordering

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class TspSpec extends AnyFunSuite {

  private def randomMetric(n: Int, seed: Long): Array[Array[Double]] = {
    // Random points on a line → a metric for sure.
    val rnd = new Random(seed)
    val pts = Array.fill(n)(rnd.nextDouble() * 100)
    Array.tabulate(n, n)((i, j) => math.abs(pts(i) - pts(j)))
  }

  test("MST has n-1 edges and spans all vertices") {
    val d = randomMetric(12, 1)
    val edges = Tsp.mst(d)
    assert(edges.size == 11)
    val seen = edges.flatMap(e => Seq(e._1, e._2)).toSet
    assert(seen == (0 until 12).toSet)
  }

  test("MST of a line metric is the sorted chain") {
    val pts = Seq(0.0, 10.0, 3.0, 7.0)
    val d = Array.tabulate(4, 4)((i, j) => math.abs(pts(i) - pts(j)))
    val cost = Tsp.mst(d).map { case (u, v) => d(u)(v) }.sum
    assert(math.abs(cost - 10.0) < 1e-9) // chain 0-2-3-1
  }

  test("greedy matching pairs everything exactly once") {
    val d = randomMetric(10, 2)
    val m = Tsp.greedyMatching(d, Seq(0, 2, 4, 6, 8, 9))
    assert(m.size == 3)
    assert(m.flatMap(e => Seq(e._1, e._2)).distinct.size == 6)
  }

  test("euler circuit uses every edge exactly once and closes") {
    val edges = Seq((0, 1), (1, 2), (2, 0), (0, 3), (3, 0))
    val c = Tsp.eulerCircuit(4, edges)
    assert(c.head == c.last)
    val used = c.sliding(2).map { case Seq(a, b) => if (a < b) (a, b) else (b, a) }.toSeq
    assert(used.sorted == edges.map { case (a, b) => if (a < b) (a, b) else (b, a) }.sorted)
  }

  test("tour visits every vertex exactly once") {
    val d = randomMetric(15, 3)
    val t = Tsp.tour(d)
    assert(t.sorted == (0 until 15))
  }

  for (seed <- Seq(4, 5, 6)) {
    test(s"tour cost is near-optimal on line metrics (seed=$seed)") {
      // For points on a line the optimal open traversal is 2·span minus the
      // two extreme gaps; the optimal *cycle* is exactly 2·span.
      val rnd = new Random(seed)
      val pts = Array.fill(10)(rnd.nextDouble() * 100)
      val d = Array.tabulate(10, 10)((i, j) => math.abs(pts(i) - pts(j)))
      val span = pts.max - pts.min
      val cost = Tsp.cycleCost(d, Tsp.tour(d))
      assert(cost <= 2 * span * 1.5 + 1e-9, s"cost $cost vs optimal ${2 * span}")
    }
  }

  test("degenerate sizes: 1 and 2 vertices") {
    assert(Tsp.tour(Array(Array(0.0))) == Seq(0))
    assert(Tsp.tour(Array(Array(0.0, 1.0), Array(1.0, 0.0))).sorted == Seq(0, 1))
  }

  test("pathCost sums consecutive distances") {
    val d = randomMetric(5, 7)
    val p = Seq(0, 3, 1)
    assert(math.abs(Tsp.pathCost(d, p) - (d(0)(3) + d(3)(1))) < 1e-12)
  }
}
