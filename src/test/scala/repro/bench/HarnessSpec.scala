package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.gvdl.Ast

/** Driver-side checks of the bench harness building blocks. */
class HarnessSpec extends AnyFunSuite {

  test("10C5 produces 252 views and 7C4 produces 35") {
    assert(Table4.subsets(10, 5).size == 252)
    assert(Table4.subsets(7, 4).size == 35)
  }

  test("subsets are distinct sorted k-sets") {
    val s = Table4.subsets(7, 4)
    assert(s.distinct.size == s.size)
    s.foreach { x => assert(x.size == 4 && x == x.sorted) }
  }

  test("removal predicates mention both endpoints of every community") {
    val vs = Table4.views(5, 2)
    assert(vs.size == 10)
    def props(e: Ast.Expr): Seq[(Ast.Target, Double)] = e match {
      case Ast.And(l, r) => props(l) ++ props(r)
      case Ast.Cmp("!=", Ast.PropRef(t, "comm"), Ast.NumLit(v)) => Seq((t, v))
      case other => fail(s"unexpected node $other")
    }
    val ps = props(vs.head._2)
    assert(ps.count(_._1 == Ast.SrcT) == 2 && ps.count(_._1 == Ast.DstT) == 2)
  }

  test("view names encode the removed subset") {
    assert(Table4.views(4, 2).map(_._1).contains("0-1"))
  }

  for (k <- Seq(1, 3, 6)) {
    test(s"subsets(6, $k) has C(6,$k) elements") {
      def c(n: Int, r: Int): Int =
        (1 to r).foldLeft(1L)((a, i) => a * (n - i + 1) / i).toInt
      assert(Table4.subsets(6, k).size == c(6, k))
    }
  }
}
