package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.exp.Experiments.{fmt, render}
import repro.graph.Generators
import repro.jobs.Table2Buildup

/** §5.1 build-up speedup (Table 2 of EXPERIMENTS.md): Spark Motivo vs the
  * Spark CC baseline, with the Figure 2/4/7 micro-impacts.
  *
  * Regime note (recorded in EXPERIMENTS.md): at k=5 these scaled-down
  * inputs are dominated by Spark's fixed job/shuffle overheads, which are
  * identical for both engines, so those ratios hover near 1. The paper's
  * effect — representation cost in the merge kernel — emerges at k=6 where
  * check-and-merge volume dominates, mirroring the paper's observation
  * that the gap grows with k.
  */
class Table2BuildupBench extends SparkSpec {

  private val scale = 0.5
  private lazy val rows = Experiments.table2(spark, Table2Buildup.configs(scale))

  test("Table 2: build-up wall-clock Motivo vs CC") {
    println(render("Table 2: build-up wall-clock, Motivo vs CC (Spark)",
      Seq("graph", "k", "motivo s", "cc s", "speedup"),
      rows.map(r => Seq(r.graph, r.k.toString, fmt(r.motivoSec), fmt(r.ccSec), fmt(r.speedup)))))
    // paper: Motivo 1.0×–4.8× faster, never slower (at real scale). Here:
    // k=6 rows must show the win; k=5 rows only must not collapse.
    // wall-clock on 10–20 s Spark jobs is noisy run-to-run, so the shape
    // assertions are aggregate: no collapse anywhere, a clear aggregate win
    // at k=6, and a decisive win on the heaviest workload.
    rows.filter(_.k == 5).foreach(r =>
      assert(r.speedup > 0.4, s"${r.graph} k=${r.k}: ${r.speedup}"))
    val k6 = rows.filter(_.k == 6)
    k6.foreach(r => assert(r.speedup > 0.7, s"${r.graph} k=6: ${r.speedup}"))
    val gmean6 = math.exp(k6.map(r => math.log(r.speedup)).sum / k6.size)
    println(f"[table2] k=6 geometric-mean speedup: $gmean6%.2fx")
    assert(gmean6 > 1.1, s"expected Motivo faster at k=6 on aggregate, geo-mean $gmean6")
    val heavy = rows.find(_.graph == "orkut-full").get
    assert(heavy.speedup > 1.4,
      s"expected a clear win on the kernel-dominated workload, got ${heavy.speedup}")
  }

  test("Figure 2: succinct check-and-merge is much faster than CC objects") {
    val (succ, cc) = Experiments.mergeMicrobench()
    println(f"[fig2] check-and-merge ops/s: succinct=$succ%.0f cc-objects=$cc%.0f (${succ / cc}%.1fx)")
    assert(succ > 2 * cc, s"expected >=2x (paper: ~2x end-to-end), got ${succ / cc}")
  }

  test("Figure 4: 0-rooting cuts build time") {
    val g = Generators.benchmarkSuite(scale).find(_._1 == "berkstan-lite").get._3
    val (tOn, tOff) = Experiments.zeroRootingImpact(g, 5)
    println(f"[fig4] berkstan-lite k=5 build: 0-rooting=${tOn}%.2fs off=${tOff}%.2fs (${tOff / tOn}%.2fx)")
    assert(tOn < tOff, "0-rooting should be faster (paper: 30–40% cut)")
  }

  test("Figure 7: build rate per edge is stable across graphs (predictability)") {
    val configs = Table2Buildup.configs(scale).filter(_._3 == 5)
    val k5 = rows.filter(_.k == 5)
    val rates = k5.map(r => r.motivoSec / (configs.find(_._1 == r.graph).get._2.m / 1e6))
    println("[fig7] motivo seconds per million edges, k=5: " +
      k5.zip(rates).map { case (r, x) => f"${r.graph}=${x}%.0f" }.mkString(" "))
    // fixed Spark overheads dominate at this scale; the paper's point is
    // the absence of blowups across very different graphs
    assert(rates.max / rates.min < 150, s"rates vary too wildly: $rates")
  }
}
