package repro.core

import repro.SparkSpec
import repro.color.Coloring
import repro.graph.{Generators, LocalGraph}
import repro.graphlet.SpanningTrees
import repro.treelet.{ColoredTreelet, Treelet, TreeletEnum}
import scala.util.Random

/** Compact table + samplers (Motivo local) and the CC baseline table. */
class TableSpec extends SparkSpec {

  private def colorsFor(g: LocalGraph, k: Int, seed: Long): Array[Int] = {
    val c = Coloring.uniform(k, seed)
    Array.tabulate(g.n)(v => c.colorOf(v.toLong))
  }

  /** CCShape → succinct code, to compare the two representations. */
  private def ccToCode(s: CCShape): Int =
    Treelet.ofChildren(s.children.map(ccToCode))

  test("alias method reproduces the weight distribution") {
    val rnd = new Random(1)
    val w = Array(1.0, 5.0, 0.5, 10.0, 3.5)
    val a = Alias(w)
    val n = 200000
    val freq = new Array[Int](w.length)
    for (_ <- 1 to n) freq(a.draw(rnd)) += 1
    val tot = w.sum
    for (i <- w.indices)
      assert(math.abs(freq(i).toDouble / n - w(i) / tot) < 0.01, s"slot $i")
  }

  test("alias rejects empty or zero-mass input") {
    intercept[IllegalArgumentException](Alias(Array.emptyDoubleArray))
    intercept[IllegalArgumentException](Alias(Array(0.0, 0.0)))
  }

  test("MotivoLocalTable occ/occCt match the DP counts") {
    val g = Generators.er(40, 110, seed = 51)
    val k = 4
    val colors = colorsFor(g, k, 1)
    val r = LocalEngine.buildUp(g, colors, k)
    val t = MotivoLocalTable.fromResult(r)
    for (h <- 1 to k; v <- 0 until g.n) {
      val exact = r.tables(h)(v)
      val sum = exact.values.foldLeft(BigInt(0))(_ + _).toDouble
      assert(math.abs(t.occ(h, v) - sum) <= 1e-6 * math.max(1.0, sum))
      for ((ct, c) <- exact)
        assert(math.abs(t.occCt(h, v, ct) - c.toDouble) <= 1e-9 * math.max(1.0, c.toDouble))
      // absent codes report zero
      assert(t.occCt(h, v, ColoredTreelet.pack(TreeletEnum.starRooted(math.min(h, 8)), 0xABCD)) == 0.0
             || exact.contains(ColoredTreelet.pack(TreeletEnum.starRooted(math.min(h, 8)), 0xABCD)))
    }
    assert(t.totalTreelets == r.totalTreelets)
  }

  test("totalsByShape of the table matches the DP result") {
    val g = Generators.ringChords(30, 20, seed = 52)
    val k = 5
    val colors = colorsFor(g, k, 2)
    val r = LocalEngine.buildUp(g, colors, k)
    val t = MotivoLocalTable.fromResult(r)
    val exact = r.totalsByShape
    assert(t.totalsByShape.keySet == exact.keySet)
    for ((s, c) <- exact)
      assert(math.abs(t.totalsByShape(s) - c.toDouble) <= 1e-6 * math.max(1.0, c.toDouble))
  }

  test("CC baseline build-up produces identical counts to the reference DP") {
    for (seed <- Seq(53, 54); k <- 3 to 5) {
      val g = Generators.er(30, 75, seed = seed)
      val colors = colorsFor(g, k, seed)
      val ref = LocalEngine.buildUp(g, colors, k)
      val cc = BaselineLocal.buildUp(g, colors, k)
      assert(cc.totalTreelets == ref.totalTreelets, s"seed=$seed k=$k")
      // per-(vertex, shape, colors) equality via representation conversion
      for (h <- 1 to k; v <- 0 until g.n) {
        val mapped = cc.tables(h)(v).map { case (t, c) =>
          val code = ccToCode(t.shape)
          val mask = t.colors.foldLeft(0)((m, col) => m | (1 << col))
          ColoredTreelet.pack(code, mask) -> BigInt(c)
        }
        assert(mapped == ref.tables(h)(v).toMap, s"seed=$seed k=$k h=$h v=$v")
      }
    }
  }

  test("CC and Motivo tables have the same number of pairs") {
    val g = Generators.er(35, 90, seed = 55)
    val k = 4
    val colors = colorsFor(g, k, 3)
    val ref = LocalEngine.buildUp(g, colors, k)
    val cc = BaselineLocal.buildUp(g, colors, k)
    assert(BaselineLocal.pairCount(cc) == MotivoLocalTable.fromResult(ref).pairCount)
  }

  test("CC table is much larger in bytes than the compact table (Table 3 shape)") {
    val g = Generators.er(60, 180, seed = 56)
    val k = 5
    val colors = colorsFor(g, k, 4)
    val cc = BaselineLocal.buildUp(g, colors, k)
    val motivo = MotivoLocalTable.fromResult(LocalEngine.buildUp(g, colors, k))
    assert(BaselineLocal.byteSize(cc) > 2 * motivo.byteSize)
  }

  test("sampleTreeletCopy returns k vertices with distinct colors forming a connected subgraph") {
    val g = Generators.er(40, 120, seed = 57)
    val k = 4
    val colors = colorsFor(g, k, 5)
    val t = MotivoLocalTable.fromResult(LocalEngine.buildUp(g, colors, k))
    val rnd = new Random(6)
    for (_ <- 1 to 300) {
      val verts = t.sampleTreeletCopy(rnd)
      assert(verts.length == k)
      assert(verts.distinct.length == k)
      for (i <- 0 until k) assert(colors(verts(i)) == i) // slotted by color
      assert(repro.graphlet.Graphlet.isConnected(LocalGraph.inducedAdj(g, verts)))
    }
  }

  test("sampled graphlet distribution matches c_i·σ_i/t (Motivo sampler)") {
    val g = Generators.er(30, 90, seed = 58)
    val k = 4
    val colors = colorsFor(g, k, 7)
    val t = MotivoLocalTable.fromResult(LocalEngine.buildUp(g, colors, k))
    val exact = LocalEngine.exactColorfulGraphletCounts(g, colors, k)
    val tt = t.totalTreelets.toDouble
    val rnd = new Random(8)
    val n = 30000
    val hits = Estimators.tally(Iterator.fill(n)(t.sampleGraphlet(rnd)))
    for ((code, c) <- exact) {
      val expected = c.toDouble * SpanningTrees.sigma(code, k).toDouble / tt
      if (expected > 0.05) {
        val got = hits.getOrElse(code, 0L).toDouble / n
        assert(math.abs(got - expected) < 0.02, s"code=$code got=$got expected=$expected")
      }
    }
  }

  test("sampled graphlet distribution matches c_i·σ_i/t (CC sampler)") {
    val g = Generators.er(30, 90, seed = 58)
    val k = 4
    val colors = colorsFor(g, k, 7)
    val ref = LocalEngine.buildUp(g, colors, k)
    val cc = BaselineLocal.buildUp(g, colors, k)
    val exact = LocalEngine.exactColorfulGraphletCounts(g, colors, k)
    val tt = ref.totalTreelets.toDouble
    val s = new BaselineLocal.Sampler(cc, new Random(9))
    val n = 30000
    val hits = Estimators.tally(Iterator.fill(n)(s.sampleGraphlet()))
    for ((code, c) <- exact) {
      val expected = c.toDouble * SpanningTrees.sigma(code, k).toDouble / tt
      if (expected > 0.05) {
        val got = hits.getOrElse(code, 0L).toDouble / n
        assert(math.abs(got - expected) < 0.02, s"code=$code got=$got expected=$expected")
      }
    }
  }

  test("neighbor buffering preserves the sampling distribution") {
    val g = Generators.starskew(400, hubs = 1, hubDeg = 150, bgEdges = 150, seed = 59)
    val k = 3
    val colors = colorsFor(g, k, 10)
    val r = LocalEngine.buildUp(g, colors, k)
    val exact = LocalEngine.exactColorfulGraphletCounts(g, colors, k)
    val tt = r.totalTreelets.toDouble
    // low threshold forces buffering on the hub
    val t = MotivoLocalTable.fromResult(r, bufferThreshold = 10)
    val rnd = new Random(11)
    val n = 20000
    val hits = Estimators.tally(Iterator.fill(n)(t.sampleGraphlet(rnd)))
    for ((code, c) <- exact) {
      val expected = c.toDouble * SpanningTrees.sigma(code, k).toDouble / tt
      if (expected > 0.05) {
        val got = hits.getOrElse(code, 0L).toDouble / n
        assert(math.abs(got - expected) < 0.02, s"code=$code got=$got expected=$expected")
      }
    }
  }

  test("shape-restricted sampling only yields graphlets spanned by that shape") {
    val g = Generators.ringChords(40, 25, seed = 60)
    val k = 4
    val colors = colorsFor(g, k, 12)
    val t = MotivoLocalTable.fromResult(LocalEngine.buildUp(g, colors, k))
    val rnd = new Random(13)
    for ((shape, tot) <- t.totalsByShape if tot > 0) {
      for (_ <- 1 to 200) {
        val code = t.sampleGraphlet(rnd, Some(shape))
        val sigmaJ = SpanningTrees.sigmaByShape(code, k).getOrElse(shape, 0L)
        assert(sigmaJ > 0, s"shape=$shape produced graphlet $code with no such spanning tree")
      }
    }
  }

  test("shape-restricted sampling matches the conditional distribution") {
    val g = Generators.er(30, 85, seed = 61)
    val k = 4
    val colors = colorsFor(g, k, 14)
    val t = MotivoLocalTable.fromResult(LocalEngine.buildUp(g, colors, k))
    val exact = LocalEngine.exactColorfulGraphletCounts(g, colors, k)
    val rnd = new Random(15)
    for ((shape, rj) <- t.totalsByShape if rj > 0) {
      // P[H_i | shape] = c_i σ_ij / r_j
      val n = 15000
      val hits = Estimators.tally(Iterator.fill(n)(t.sampleGraphlet(rnd, Some(shape))))
      for ((code, c) <- exact) {
        val sij = SpanningTrees.sigmaByShape(code, k).getOrElse(shape, 0L).toDouble
        val expected = c.toDouble * sij / rj
        if (expected > 0.07) {
          val got = hits.getOrElse(code, 0L).toDouble / n
          assert(math.abs(got - expected) < 0.03, s"shape=$shape code=$code got=$got exp=$expected")
        }
      }
    }
  }
}
