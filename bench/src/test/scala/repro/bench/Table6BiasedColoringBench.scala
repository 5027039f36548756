package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.exp.Experiments.{fmt, render}
import repro.graph.Generators

/** §3.4 biased coloring (Table 6 of EXPERIMENTS.md): smaller/faster builds,
  * bounded accuracy loss.
  */
class Table6BiasedColoringBench extends SparkSpec {

  private val scale = 0.5
  private val k = 5

  test("Table 6: biased coloring trades accuracy for time and space") {
    val byName = Generators.benchmarkSuite(scale).map(t => t._1 -> t._3).toMap
    val big = byName("friendster-lite")
    val small = byName("amazon-lite")
    val truth = repro.core.ExactCount.census(small, k).map { case (c, n) => c -> n.toDouble }

    // aggressive λ on the big graph (time/space), milder λ on the small
    // error graph — concentration needs λ^{k-1}·n/Δ^{k-2} large (§3.4)
    val timing = Experiments.table6(spark, big, "friendster-lite", k,
      Seq(None, Some(0.06), Some(0.03)), truth = Map.empty, budget = 1)
    val errors = Experiments.table6(spark, small, "amazon-lite", k,
      Seq(None, Some(0.12), Some(0.06)), truth, budget = 60000)

    println(render("Table 6: biased coloring (§3.4)",
      Seq("graph", "k", "lambda", "build s", "pairs", "med |err|", "p90 |err|"),
      (timing ++ errors).map(r => Seq(r.graph, r.k.toString, r.lambda, fmt(r.buildSec),
        r.pairs.toString,
        if (r.medAbsErr.isNaN) "-" else f"${r.medAbsErr}%.3f",
        if (r.p90AbsErr.isNaN) "-" else f"${r.p90AbsErr}%.3f"))))

    // paper: ≥2× less table mass; build-time shrinks 1.7×–7× at scale (at
    // our scale Spark overheads flatten wall-clock, so the load-bearing
    // assertion is on table mass, the driver of both time and space).
    val uniformPairs = timing.find(_.lambda == "uniform").get.pairs
    val biasedPairs = timing.find(_.lambda == "0.030").get.pairs
    assert(biasedPairs * 2 < uniformPairs,
      s"expected >=2x fewer pairs: uniform=$uniformPairs biased=$biasedPairs")

    // error grows as λ shrinks, but stays bounded (Figure 6 shape)
    val errByLambda = errors.map(r => r.lambda -> r.medAbsErr).toMap
    assert(errByLambda("uniform") < 0.35, s"uniform med err ${errByLambda("uniform")}")
    assert(errByLambda("0.060") < 1.5, s"biased error blew up: ${errByLambda("0.060")}")
    assert(errByLambda("uniform") <= errByLambda("0.060") + 0.15,
      "uniform should not be (much) less accurate than strongly biased")
  }
}
