package repro.treelet

import repro.SparkSpec

/** Succinct treelet codec invariants (paper §3.1). */
class TreeletSpec extends SparkSpec {
  import Treelet._

  test("singleton has size 1 and empty bitstring") {
    assert(size(Singleton) == 1)
    assert(bitLength(Singleton) == 0)
    assert(toBitString(Singleton) == "")
  }

  test("edge treelet is '10'") {
    val e = merge(Singleton, Singleton)
    assert(toBitString(e) == "10")
    assert(size(e) == 2)
  }

  test("path on 3 rooted at endpoint is '1100'") {
    val p3 = TreeletEnum.pathRooted(3)
    assert(toBitString(p3) == "1100")
  }

  test("star on 3 rooted at center is '1010'") {
    val s3 = TreeletEnum.starRooted(3)
    assert(toBitString(s3) == "1010")
  }

  test("rooted tree counts match A000081 for sizes 1..8") {
    val expected = Seq(1, 1, 2, 4, 9, 20, 48, 115)
    for ((e, h) <- expected.zipWithIndex)
      assert(TreeletEnum.rootedTrees(h + 1).size == e, s"size ${h + 1}")
  }

  test("free tree counts match A000055 for sizes 1..8") {
    val expected = Seq(1, 1, 1, 2, 3, 6, 11, 23)
    for ((e, h) <- expected.zipWithIndex)
      assert(TreeletEnum.freeTrees(h + 1).size == e, s"size ${h + 1}")
  }

  test("all enumerated codes are valid and correctly sized") {
    for (h <- 1 to 8; t <- TreeletEnum.rootedTrees(h)) {
      assert(isValid(t), s"invalid: ${toBitString(t)}")
      assert(size(t) == h)
      assert(bitLength(t) == 2 * (h - 1))
    }
  }

  test("enumerated codes are strictly increasing in unsigned order") {
    for (h <- 1 to 8) {
      val ts = TreeletEnum.rootedTrees(h)
      for (Seq(a, b) <- ts.sliding(2) if ts.size > 1)
        assert(Integer.compareUnsigned(a, b) < 0)
    }
  }

  test("decomp is the inverse of merge over all valid merges up to size 8") {
    for {
      h <- 2 to 8
      h2 <- 1 until h
      t1 <- TreeletEnum.rootedTrees(h - h2)
      t2 <- TreeletEnum.rootedTrees(h2)
      if canMerge(t1, t2)
    } {
      val m = merge(t1, t2)
      assert(isValid(m), s"merge(${toBitString(t1)},${toBitString(t2)})")
      assert(size(m) == h)
      val (b1, b2) = decomp(m)
      assert(b1 == t1 && b2 == t2)
    }
  }

  test("every non-singleton enumerated tree decomposes into enumerated trees") {
    for (h <- 2 to 8; t <- TreeletEnum.rootedTrees(h)) {
      val (t1, t2) = decomp(t)
      assert(TreeletEnum.rootedTrees(size(t1)).contains(t1))
      assert(TreeletEnum.rootedTrees(size(t2)).contains(t2))
      assert(merge(t1, t2) == t)
    }
  }

  test("beta of stars: star on h nodes has beta h-1") {
    for (h <- 2 to 8) assert(beta(TreeletEnum.starRooted(h)) == h - 1)
  }

  test("beta of endpoint-rooted paths is 1") {
    for (h <- 2 to 8) assert(beta(TreeletEnum.pathRooted(h)) == 1)
  }

  test("beta of center-rooted path (spider with 2 equal legs) is 2") {
    // root with two path-legs of equal length
    val leg = TreeletEnum.pathRooted(3) // 2 extra nodes per leg
    val t = merge(merge(Singleton, leg), leg)
    assert(beta(t) == 2)
  }

  test("beta equals count of first-child-isomorphic children (exhaustive ≤ 8)") {
    for (h <- 2 to 8; t <- TreeletEnum.rootedTrees(h)) {
      val cs = children(t)
      val expected = cs.count(_ == cs.head)
      assert(beta(t) == expected, toBitString(t))
    }
  }

  test("children are sorted ascending and ofChildren reconstructs the code") {
    for (h <- 2 to 8; t <- TreeletEnum.rootedTrees(h)) {
      val cs = children(t)
      assert(cs == cs.sortWith((a, b) => Integer.compareUnsigned(a, b) < 0) ||
             cs == cs.sortWith((a, b) => Integer.compareUnsigned(a, b) <= 0))
      assert(ofChildren(cs) == t)
    }
  }

  test("ofChildren is order-insensitive (randomized)") {
    val rnd = new scala.util.Random(42)
    val trees = TreeletEnum.rootedTrees(3) ++ TreeletEnum.rootedTrees(2) ++ TreeletEnum.rootedTrees(1)
    for (_ <- 1 to 200) {
      val cs = List.fill(1 + rnd.nextInt(4))(trees(rnd.nextInt(trees.size)))
      if (cs.map(size).sum <= 14) {
        val a = ofChildren(cs)
        val b = ofChildren(rnd.shuffle(cs))
        assert(a == b)
      }
    }
  }

  test("toParents roundtrip: canonicalFromParents(toParents(t), 0) == t") {
    for (h <- 1 to 8; t <- TreeletEnum.rootedTrees(h)) {
      val par = Treelet.toParents(t)
      assert(par.length == h)
      assert(Treelet.canonicalFromParents(par, 0) == t)
    }
  }

  test("freeShape is invariant under re-rooting (all rootings, sizes ≤ 7)") {
    for (h <- 1 to 7; t <- TreeletEnum.rootedTrees(h)) {
      val par = Treelet.toParents(t)
      val shapes = (0 until h).map(r => TreeletEnum.freeShape(Treelet.canonicalFromParents(par, r)))
      assert(shapes.distinct.size == 1, s"tree ${toBitString(t)} re-rootings disagree")
      assert(shapes.head == TreeletEnum.freeShape(t))
    }
  }

  test("freeShape maps rooted trees onto the free-tree list") {
    for (h <- 1 to 8) {
      val frees = TreeletEnum.freeTrees(h).toSet
      for (t <- TreeletEnum.rootedTrees(h)) assert(frees.contains(TreeletEnum.freeShape(t)))
    }
  }

  test("invalid codes are rejected") {
    assert(!isValid(0x40000000))       // starts with 0
    assert(!isValid(0x80000001))       // stray low bit
    assert(!isValid(0x88000000))       // "1000…": balance goes negative
    assert(isValid(0xC0000000))        // "1100" = path on 3, valid
  }

  test("centroids of a path are the middle node(s)") {
    for (h <- 2 to 8) {
      val par = Treelet.toParents(TreeletEnum.pathRooted(h))
      val cs = TreeletEnum.centroids(par)
      assert(cs.size == (if (h % 2 == 0) 2 else 1), s"h=$h -> $cs")
    }
  }

  test("unsigned code order equals lexicographic DFS-string order (exhaustive ≤ 7)") {
    val all = (1 to 7).flatMap(TreeletEnum.rootedTrees)
    for (a <- all; b <- all) {
      // string comparison where a shorter prefix sorts first
      val sa = toBitString(a); val sb = toBitString(b)
      val lex = if (sa == sb) 0 else if (sa < sb) -1 else 1
      val enc = Integer.compareUnsigned(a, b)
      if (sa.startsWith(sb) || sb.startsWith(sa)) {
        // prefix case: shorter sorts first in both conventions
        assert(Integer.signum(enc) == Integer.signum(sa.length.compare(sb.length)) || sa == sb)
      } else assert(Integer.signum(enc) == lex, s"$sa vs $sb")
    }
  }
}
