package repro.graphlet

import repro.SparkSpec
import repro.treelet.TreeletEnum

/** Kirchhoff σ_i and per-shape σ_ij (paper §3.3) invariants. */
class SpanningTreesSpec extends SparkSpec {

  private def pathAdj(k: Int): Array[Int] = {
    val a = new Array[Int](k)
    for (i <- 0 until k - 1) { a(i) |= 1 << (i + 1); a(i + 1) |= 1 << i }
    a
  }
  private def cycleAdj(k: Int): Array[Int] = {
    val a = pathAdj(k); a(0) |= 1 << (k - 1); a(k - 1) |= 1; a
  }
  private def starAdj(k: Int): Array[Int] = {
    val a = new Array[Int](k)
    for (i <- 1 until k) { a(0) |= 1 << i; a(i) |= 1 }
    a
  }
  private def cliqueAdj(k: Int): Array[Int] = {
    val a = new Array[Int](k)
    for (i <- 0 until k; j <- 0 until k if i != j) a(i) |= 1 << j
    a
  }

  test("kirchhoff: trees have exactly one spanning tree") {
    for (k <- 2 to 8) {
      assert(SpanningTrees.kirchhoff(pathAdj(k)) == BigInt(1))
      assert(SpanningTrees.kirchhoff(starAdj(k)) == BigInt(1))
    }
  }

  test("kirchhoff: cycle C_k has k spanning trees") {
    for (k <- 3 to 8) assert(SpanningTrees.kirchhoff(cycleAdj(k)) == BigInt(k))
  }

  test("kirchhoff: clique K_k has k^(k-2) spanning trees (Cayley)") {
    for (k <- 2 to 8)
      assert(SpanningTrees.kirchhoff(cliqueAdj(k)) == BigInt(k).pow(k - 2))
  }

  test("kirchhoff: complete bipartite K_{2,3} has 2^2·3^1 = 12 spanning trees") {
    // parts {0,1} and {2,3,4}
    val a = new Array[Int](5)
    for (i <- 0 to 1; j <- 2 to 4) { a(i) |= 1 << j; a(j) |= 1 << i }
    assert(SpanningTrees.kirchhoff(a) == BigInt(12))
  }

  test("kirchhoff of a disconnected graph is 0") {
    val a = new Array[Int](4)
    a(0) |= 2; a(1) |= 1; a(2) |= 8; a(3) |= 4 // two disjoint edges
    assert(SpanningTrees.kirchhoff(a) == BigInt(0))
  }

  test("bareissDet: known determinants") {
    def m(rows: Seq[Seq[Int]]) = rows.map(_.map(BigInt(_)).toArray).toArray
    assert(SpanningTrees.bareissDet(m(Seq(Seq(2)))) == BigInt(2))
    assert(SpanningTrees.bareissDet(m(Seq(Seq(1, 2), Seq(3, 4)))) == BigInt(-2))
    assert(SpanningTrees.bareissDet(m(Seq(Seq(0, 1), Seq(1, 0)))) == BigInt(-1)) // needs pivot swap
    assert(SpanningTrees.bareissDet(m(Seq(Seq(1, 2), Seq(2, 4)))) == BigInt(0))  // singular
    assert(SpanningTrees.bareissDet(
      m(Seq(Seq(2, -1, 0), Seq(-1, 2, -1), Seq(0, -1, 2)))) == BigInt(4))
  }

  test("sigmaByShape sums to sigma for all graphlets on 4 and 5 nodes") {
    for (k <- Seq(4, 5); code <- Graphlet.allConnected(k)) {
      val byShape = SpanningTrees.sigmaByShape(code, k)
      val total = byShape.values.map(BigInt(_)).sum
      assert(total == SpanningTrees.sigma(code, k), s"k=$k code=$code")
      byShape.keys.foreach(s => assert(TreeletEnum.freeTrees(k).contains(s)))
    }
  }

  test("sigmaByShape sums to sigma on random 6- and 7-node graphlets") {
    val rnd = new scala.util.Random(21)
    for (k <- Seq(6, 7); _ <- 1 to 15) {
      val adj = new Array[Int](k)
      for (i <- 0 until k; j <- i + 1 until k if rnd.nextDouble() < 0.5) {
        adj(i) |= 1 << j; adj(j) |= 1 << i
      }
      if (Graphlet.isConnected(adj)) {
        val code = Graphlet.canonical(adj)
        val byShape = SpanningTrees.sigmaByShape(code, k)
        assert(byShape.values.map(BigInt(_)).sum == SpanningTrees.sigma(code, k))
      }
    }
  }

  test("path graphlet has only the path shape; star only the star shape") {
    for (k <- 3 to 7) {
      val pCode = Graphlet.canonical(pathAdj(k))
      val pShapes = SpanningTrees.sigmaByShape(pCode, k)
      assert(pShapes == Map(TreeletEnum.freeShape(TreeletEnum.pathRooted(k)) -> 1L))
      val sCode = Graphlet.canonical(starAdj(k))
      val sShapes = SpanningTrees.sigmaByShape(sCode, k)
      assert(sShapes == Map(TreeletEnum.freeShape(TreeletEnum.starRooted(k)) -> 1L))
    }
  }

  test("K4: 16 spanning trees = 12 paths + 4 stars") {
    val code = Graphlet.canonical(cliqueAdj(4))
    val byShape = SpanningTrees.sigmaByShape(code, 4)
    val pathShape = TreeletEnum.freeShape(TreeletEnum.pathRooted(4))
    val starShape = TreeletEnum.freeShape(TreeletEnum.starRooted(4))
    assert(byShape == Map(pathShape -> 12L, starShape -> 4L))
  }

  test("cycle C_k spanning trees are all paths") {
    for (k <- 3 to 7) {
      val code = Graphlet.canonical(cycleAdj(k))
      val byShape = SpanningTrees.sigmaByShape(code, k)
      assert(byShape == Map(TreeletEnum.freeShape(TreeletEnum.pathRooted(k)) -> k.toLong))
    }
  }
}
