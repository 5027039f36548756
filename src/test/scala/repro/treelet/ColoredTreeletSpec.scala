package repro.treelet

import repro.SparkSpec

/** Colored treelet codec invariants (paper §3.1, Figure 1). */
class ColoredTreeletSpec extends SparkSpec {
  import ColoredTreelet._

  test("pack/unpack roundtrip over enumerated shapes and random masks") {
    val rnd = new scala.util.Random(1)
    for (h <- 1 to 8; t <- TreeletEnum.rootedTrees(h); _ <- 1 to 3) {
      val mask = rnd.nextInt(1 << 16)
      val ct = pack(t, mask)
      assert(shape(ct) == t)
      assert(colorMask(ct) == mask)
    }
  }

  test("singleton is consistent and carries its color") {
    for (c <- 0 until 16) {
      val ct = singleton(c)
      assert(isConsistent(ct))
      assert(colorMask(ct) == (1 << c))
      assert(size(ct) == 1)
    }
  }

  test("tryMerge requires disjoint colors") {
    val a = singleton(3)
    val b = singleton(3)
    assert(tryMerge(a, b) == -1L)
    assert(tryMerge(a, singleton(4)) != -1L)
  }

  test("tryMerge unions color masks and sums sizes") {
    val e = tryMerge(singleton(0), singleton(1))
    assert(e != -1L)
    assert(colorMask(e) == 3)
    assert(size(e) == 2)
    val p3 = tryMerge(e, singleton(2))
    assert(p3 != -1L)
    assert(size(p3) == 3)
    assert(colorMask(p3) == 7)
  }

  test("tryMerge respects canonical shape order") {
    // t1 = edge rooted at top (child = leaf), t2 = path of 2 ("10")
    val leaf = pack(Treelet.Singleton, 1 << 5)
    val edge = tryMerge(pack(Treelet.Singleton, 1 << 0), pack(Treelet.Singleton, 1 << 1))
    // merging a bigger-encoded subtree under a root whose first child is a
    // leaf must fail: edge shape "10" > leaf shape ""
    val t1 = tryMerge(pack(Treelet.Singleton, 1 << 2), leaf) // root with leaf child
    assert(t1 != -1L)
    assert(tryMerge(t1, edge) == -1L, "non-canonical merge accepted")
    // and the other way around is fine
    val t2 = tryMerge(pack(Treelet.Singleton, 1 << 2), edge)
    assert(t2 != -1L)
    assert(tryMerge(t2, leaf) != -1L)
  }

  test("isConsistent detects mask/size mismatch") {
    assert(!isConsistent(pack(TreeletEnum.pathRooted(3), 1)))
    assert(isConsistent(pack(TreeletEnum.pathRooted(3), 7)))
  }

  test("subsetsOfSize returns C(n, k) distinct masks inside the superset") {
    def binom(n: Int, k: Int): Int =
      if (k < 0 || k > n) 0 else (1 to k).foldLeft(1)((a, i) => a * (n - i + 1) / i)
    val rnd = new scala.util.Random(2)
    for (_ <- 1 to 50) {
      val mask = rnd.nextInt(1 << 10)
      val n = Integer.bitCount(mask)
      for (want <- 0 to n) {
        val subs = subsetsOfSize(mask, want)
        assert(subs.size == binom(n, want))
        assert(subs.distinct.size == subs.size)
        subs.foreach(s => assert((s & ~mask) == 0 && Integer.bitCount(s) == want))
      }
    }
  }

  test("colorSplits merge back to the original colored treelet") {
    val rnd = new scala.util.Random(3)
    for (h <- 2 to 7; t <- TreeletEnum.rootedTrees(h); _ <- 1 to 2) {
      // random color set of exactly h colors in [0, 8)
      val colors = rnd.shuffle((0 until 8).toList).take(h)
      val mask = colors.foldLeft(0)((m, c) => m | (1 << c))
      val ct = pack(t, mask)
      val splits = colorSplits(ct)
      val (s1, s2) = Treelet.decomp(t)
      val h2 = Treelet.size(s2)
      assert(splits.size == subsetsOfSize(mask, h2).size)
      for ((ct1, ct2) <- splits) {
        assert(isConsistent(ct1) && isConsistent(ct2))
        assert(shape(ct1) == s1 && shape(ct2) == s2)
        assert(tryMerge(ct1, ct2) == ct)
      }
    }
  }
}
