package repro.props

import org.scalacheck.{Gen, Properties}
import org.scalacheck.Prop.{forAll, propBoolean}
import repro.color.Coloring
import repro.graphlet.Graphlet
import repro.treelet.{ColoredTreelet, Treelet, TreeletEnum}

/** Randomized property coverage for the codecs (ScalaCheck framework —
  * discovered by sbt alongside the ScalaTest suites).
  */
object CodecProps extends Properties("Codecs") {

  private val anyRooted: Gen[Int] =
    Gen.choose(1, 8).flatMap(h => Gen.oneOf(TreeletEnum.rootedTrees(h)))

  private val smallRooted: Gen[Int] =
    Gen.choose(1, 4).flatMap(h => Gen.oneOf(TreeletEnum.rootedTrees(h)))

  property("treelet size = popcount + 1") = forAll(anyRooted) { t =>
    Treelet.size(t) == Integer.bitCount(t) + 1
  }

  property("treelet codes are valid Dyck words") = forAll(anyRooted)(Treelet.isValid)

  property("merge then decomp is identity when canonical") =
    forAll(smallRooted, smallRooted) { (t1, t2) =>
      (Treelet.size(t1) + Treelet.size(t2) <= 8 && Treelet.canMerge(t1, t2)) ==> {
        val m = Treelet.merge(t1, t2)
        Treelet.decomp(m) == ((t1, t2)) && Treelet.isValid(m)
      }
    }

  property("beta is at least 1 and at most the root's child count") =
    forAll(anyRooted.suchThat(_ != 0)) { t =>
      val b = Treelet.beta(t)
      b >= 1 && b <= Treelet.children(t).size
    }

  property("colored pack/unpack roundtrip") =
    forAll(anyRooted, Gen.choose(0, 0xFFFF)) { (t, mask) =>
      val ct = ColoredTreelet.pack(t, mask)
      ColoredTreelet.shape(ct) == t && ColoredTreelet.colorMask(ct) == mask
    }

  property("colored merge demands disjoint colors") =
    forAll(smallRooted, smallRooted, Gen.choose(0, 0xFF), Gen.choose(0, 0xFF)) {
      (t1, t2, m1, m2) =>
        val r = ColoredTreelet.tryMerge(ColoredTreelet.pack(t1, m1), ColoredTreelet.pack(t2, m2))
        ((m1 & m2) != 0) ==> (r == -1L)
    }

  private val adjGen: Gen[Array[Int]] = for {
    k <- Gen.choose(2, 7)
    bits <- Gen.listOfN(k * (k - 1) / 2, Gen.oneOf(true, false))
  } yield {
    val adj = new Array[Int](k)
    var idx = 0
    for (i <- 0 until k; j <- i + 1 until k) {
      if (bits(idx)) { adj(i) |= 1 << j; adj(j) |= 1 << i }
      idx += 1
    }
    adj
  }

  property("graphlet encode/decode roundtrip") = forAll(adjGen) { adj =>
    Graphlet.decode(Graphlet.encode(adj), adj.length).toSeq == adj.toSeq
  }

  property("canonical code is a fixpoint") = forAll(adjGen) { adj =>
    val c = Graphlet.canonical(adj)
    Graphlet.canonicalOfCode(c, adj.length) == c
  }

  property("canonical is permutation-invariant") =
    forAll(adjGen, Gen.long) { (adj, s) =>
      val k = adj.length
      val perm = new scala.util.Random(s).shuffle((0 until k).toList).toArray
      val out = new Array[Int](k)
      for (i <- 0 until k; j <- 0 until k if ((adj(perm(i)) >> perm(j)) & 1) == 1)
        out(i) |= 1 << j
      Graphlet.canonical(out) == Graphlet.canonical(adj)
    }

  property("canonical preserves edge count") = forAll(adjGen) { adj =>
    Graphlet.edgeCount(Graphlet.canonical(adj)) == adj.map(Integer.bitCount).sum / 2
  }

  property("colorOf lands in [0,k) and is deterministic") =
    forAll(Gen.choose(2, 16), Gen.long, Gen.long) { (k, seed, v) =>
      val c = Coloring.uniform(k, seed)
      val col = c.colorOf(v)
      col >= 0 && col < k && col == c.colorOf(v)
    }

  property("pColorful is a probability and maximal at uniform") =
    forAll(Gen.choose(3, 10), Gen.choose(0.01, 0.95)) { (k, frac) =>
      val lam = frac / k // keep (k-1)λ < 1
      val c = Coloring(k, lam, 1)
      val u = Coloring.uniform(k, 1)
      c.pColorful >= 0 && c.pColorful <= 1 && c.pColorful <= u.pColorful + 1e-12
    }

  property("freeShape is shared by all rootings") = forAll(anyRooted) { t =>
    val par = Treelet.toParents(t)
    val shapes = par.indices.map(r => TreeletEnum.freeShape(Treelet.canonicalFromParents(par, r)))
    shapes.distinct.size == 1
  }

  property("subsetsOfSize returns only subsets of the right size") =
    forAll(Gen.choose(0, 0x3FF), Gen.choose(0, 6)) { (mask, want) =>
      ColoredTreelet.subsetsOfSize(mask, want).forall(s =>
        (s & ~mask) == 0 && Integer.bitCount(s) == want)
    }
}
