package repro.exp

import repro.SparkSpec
import repro.graph.Generators
import repro.graphlet.{Graphlet, SpanningTrees}
import repro.treelet.TreeletEnum

/** Experiment-harness units: the helpers the tables are assembled from. */
class ExperimentsSpec extends SparkSpec {

  test("render aligns columns and includes every row") {
    val s = Experiments.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = s.split("\n")
    assert(lines.length == 4)
    assert(lines(0).contains("T"))
    assert(lines.drop(1).map(_.length).distinct.size <= 2) // padded widths
  }

  test("fmt picks sensible precision") {
    assert(Experiments.fmt(12345.6) == "12346")
    assert(Experiments.fmt(3.14159) == "3.1")
    assert(Experiments.fmt(0.01234) == "0.012")
  }

  test("table1 rows are deterministic and complete") {
    val a = Experiments.table1(0.25)
    val b = Experiments.table1(0.25)
    assert(a == b)
    assert(a.map(_.paperGraph).toSet == Set("Facebook", "BerkStan", "Amazon", "DBLP",
      "Orkut", "LiveJournal", "Yelp", "Twitter", "Friendster"))
  }

  test("starCode is the canonical star and is star-spanned only") {
    for (k <- 4 to 7) {
      val code = Experiments.starCode(k)
      assert(Graphlet.canonicalOfCode(code, k) == code)
      assert(Graphlet.edgeCount(code) == k - 1)
      val shapes = SpanningTrees.sigmaByShape(code, k)
      assert(shapes == Map(TreeletEnum.freeShape(TreeletEnum.starRooted(k)) -> 1L))
    }
  }

  test("mergeMicrobench reports positive rates with succinct faster") {
    val (succ, cc) = Experiments.mergeMicrobench(reps = 50000)
    assert(succ > 0 && cc > 0)
    assert(succ > cc)
  }

  test("proxyTruth approximates the census on a small graph") {
    val g = Generators.er(50, 140, seed = 401)
    val k = 4
    val truth = repro.core.ExactCount.census(g, k).map { case (c, n) => c -> n.toDouble }
    val proxy = Experiments.proxyTruth(g, k, budget = 20000, seed = 5, runs = 2)
    for ((code, c) <- truth if c >= 500) {
      val p = proxy.getOrElse(code, 0.0)
      assert(math.abs(p - c) / c < 0.5, s"code=$code proxy=$p truth=$c")
    }
  }

  test("table3 and table4 run on a tiny config and keep their invariants") {
    val g = Generators.er(40, 110, seed = 402)
    val sizes = Experiments.table3(Seq(("tiny", g, 4)))
    assert(sizes.head.ratio > 1.0)
    assert(sizes.head.pairs > 0)
    val rates = Experiments.table4(Seq(("tiny", g, 4)), samples = 2000)
    assert(rates.head.motivoRate > 0 && rates.head.ccRate > 0)
  }

  test("zeroRootingImpact returns positive timings") {
    val g = Generators.er(60, 160, seed = 403)
    val (on, off) = Experiments.zeroRootingImpact(g, 4)
    assert(on > 0 && off > 0)
  }
}
