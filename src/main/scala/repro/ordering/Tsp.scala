package repro.ordering

import scala.collection.mutable

/** Christofides-style metric-TSP heuristic used to solve CBMP (§4).
  *
  * Steps: Prim MST → odd-degree vertices → min-weight matching on them →
  * Euler circuit of the MST+matching multigraph (Hierholzer) → shortcut to
  * a Hamiltonian cycle.
  *
  * Departure from the paper: Christofides' exact minimum-weight perfect
  * matching (blossom) is replaced by a greedy matching (sort all odd-pairs
  * by weight, take greedily). This trades the 1.5 worst-case bound for
  * simplicity; on Hamming-distance matrices the tour quality is verified
  * empirically in tests and in the Table 4 reproduction.
  */
object Tsp {

  /** Prim's MST; returns the edge list as (u, v) pairs. O(n²). */
  def mst(d: Array[Array[Double]]): Seq[(Int, Int)] = {
    val n = d.length
    if (n <= 1) return Nil
    val inTree = new Array[Boolean](n)
    val best   = Array.fill(n)(Double.MaxValue)
    val parent = Array.fill(n)(-1)
    best(0) = 0.0
    val edges = Seq.newBuilder[(Int, Int)]
    var added = 0
    while (added < n) {
      var u = -1
      var ub = Double.MaxValue
      var i = 0
      while (i < n) { if (!inTree(i) && best(i) < ub) { u = i; ub = best(i) }; i += 1 }
      inTree(u) = true
      added += 1
      if (parent(u) >= 0) edges += ((parent(u), u))
      i = 0
      while (i < n) {
        if (!inTree(i) && d(u)(i) < best(i)) { best(i) = d(u)(i); parent(i) = u }
        i += 1
      }
    }
    edges.result()
  }

  /** Greedy min-weight perfect matching over `verts` (must be even). */
  def greedyMatching(d: Array[Array[Double]], verts: Seq[Int]): Seq[(Int, Int)] = {
    val pairs = for {
      i <- verts.indices
      j <- (i + 1) until verts.size
    } yield (d(verts(i))(verts(j)), verts(i), verts(j))
    val matched = mutable.Set.empty[Int]
    val out = Seq.newBuilder[(Int, Int)]
    pairs.sortBy(p => (p._1, p._2, p._3)).foreach { case (_, u, v) =>
      if (!matched(u) && !matched(v)) { matched += u; matched += v; out += ((u, v)) }
    }
    out.result()
  }

  /** Hierholzer Euler circuit of a connected even-degree multigraph given
    * as an edge list; returns the vertex sequence (first == last).
    */
  def eulerCircuit(n: Int, edges: Seq[(Int, Int)]): Seq[Int] = {
    if (edges.isEmpty) return Seq(0)
    val adj = Array.fill(n)(mutable.ArrayBuffer.empty[Int]) // edge indices
    edges.zipWithIndex.foreach { case ((u, v), i) => adj(u) += i; adj(v) += i }
    val used = new Array[Boolean](edges.size)
    val ptr  = new Array[Int](n)
    val stack = mutable.Stack(edges.head._1)
    val circuit = mutable.ArrayBuffer.empty[Int]
    while (stack.nonEmpty) {
      val v = stack.top
      var advanced = false
      while (!advanced && ptr(v) < adj(v).size) {
        val ei = adj(v)(ptr(v))
        ptr(v) += 1
        if (!used(ei)) {
          used(ei) = true
          val (a, b) = edges(ei)
          stack.push(if (a == v) b else a)
          advanced = true
        }
      }
      if (!advanced) circuit += stack.pop()
    }
    circuit.toSeq
  }

  /** Full heuristic: Hamiltonian cycle over all n vertices (first element
    * repeated implicitly, not included twice).
    */
  def tour(d: Array[Array[Double]]): Seq[Int] = {
    val n = d.length
    if (n <= 2) return (0 until n)
    val treeEdges = mst(d)
    val deg = new Array[Int](n)
    treeEdges.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    val odd = (0 until n).filter(deg(_) % 2 == 1)
    val matching = greedyMatching(d, odd)
    val circuit = eulerCircuit(n, treeEdges ++ matching)
    val seen = new Array[Boolean](n)
    val ham = Seq.newBuilder[Int]
    circuit.foreach { v => if (!seen(v)) { seen(v) = true; ham += v } }
    ham.result()
  }

  /** Cost of a cycle (including the closing edge). */
  def cycleCost(d: Array[Array[Double]], cycle: Seq[Int]): Double =
    cycle.indices.map(i => d(cycle(i))(cycle((i + 1) % cycle.size))).sum

  /** Cost of an open path. */
  def pathCost(d: Array[Array[Double]], path: Seq[Int]): Double =
    path.sliding(2).collect { case Seq(a, b) => d(a)(b) }.sum
}
