package repro.core

import org.apache.spark.sql.SparkSession
import repro.color.Coloring
import repro.graph.{Graphs, LocalGraph}
import scala.util.Random

/** End-to-end orchestration: build the urn, sample, estimate — the API the
  * jobs and benches drive.
  *
  * Two sampling backends share the [[ShapeSampling]] interface:
  * - [[LocalShapeSampler]], the in-memory Motivo table (alias + binary
  *   search + neighbor buffering) fed by either the Spark or the local DP —
  *   used where the paper measures single-machine sampling rates;
  * - [[DistSampler]], the DataFrame sampler — the distributed path.
  */
object Motivo {

  /** Adapter: local Motivo table → AGS sampling interface. */
  final class LocalShapeSampler(val table: MotivoLocalTable, seed: Long) extends ShapeSampling {
    private val rnd = new Random(seed)
    val k: Int = table.k
    def totalsByShape: Map[Int, Double] = table.totalsByShape
    def sampleBatch(shape: Option[Int], b: Int): Seq[Long] =
      Seq.fill(b)(table.sampleGraphlet(rnd, shape))
  }

  final case class Run(
      k: Int,
      coloring: Coloring,
      totalTreelets: BigInt,
      naiveHits: Option[Map[Long, Long]],
      naiveSamples: Long,
      ags: Option[AGS.AGSResult]) {

    def naiveCounts: Map[Long, Double] = naiveHits match {
      case Some(h) if naiveSamples > 0 =>
        Estimators.naiveCounts(h, naiveSamples, totalTreelets, k, coloring.pColorful)
      case _ => Map.empty
    }

    def agsCounts: Map[Long, Double] =
      ags.map(_.counts(coloring.pColorful)).getOrElse(Map.empty)
  }

  /** Build on Spark, sample locally (the paper's single-machine sampling
    * rates), with both naive and AGS estimates.
    */
  def runSparkBuild(spark: SparkSession, g: LocalGraph, k: Int,
                    budget: Long, seed: Long = 7,
                    lambda: Option[Double] = None,
                    cbar: Int = 1000,
                    doNaive: Boolean = true, doAGS: Boolean = true): Run = {
    val coloring = lambda.map(Coloring(k, _, seed)).getOrElse(Coloring.uniform(k, seed))
    val build = BuildUp.runLocalGraph(spark, g, coloring)
    try {
      val colors = Array.tabulate(g.n)(v => coloring.colorOf(v.toLong))
      val local = build.toLocalResult(g, colors)
      runFromLocalResult(local, coloring, budget, seed, cbar, doNaive, doAGS)
    } finally build.unpersist()
  }

  /** Pure in-memory run (no Spark) — micro-benches and tests. */
  def runLocal(g: LocalGraph, k: Int, budget: Long, seed: Long = 7,
               lambda: Option[Double] = None, cbar: Int = 1000,
               doNaive: Boolean = true, doAGS: Boolean = true): Run = {
    val coloring = lambda.map(Coloring(k, _, seed)).getOrElse(Coloring.uniform(k, seed))
    val colors = Array.tabulate(g.n)(v => coloring.colorOf(v.toLong))
    val local = LocalEngine.buildUp(g, colors, k)
    runFromLocalResult(local, coloring, budget, seed, cbar, doNaive, doAGS)
  }

  private def runFromLocalResult(local: LocalEngine.Result, coloring: Coloring,
                                 budget: Long, seed: Long, cbar: Int,
                                 doNaive: Boolean, doAGS: Boolean): Run = {
    val table = MotivoLocalTable.fromResult(local)
    val naive =
      if (doNaive) Some(AGS.naive(new LocalShapeSampler(table, seed + 1), budget))
      else None
    val ags =
      if (doAGS) Some(AGS.run(new LocalShapeSampler(table, seed + 2), budget, cbar = cbar))
      else None
    Run(local.k, coloring, table.totalTreelets, naive, budget, ags)
  }

  /** Fully distributed run: Spark build-up + Spark sampler. */
  def runSparkFull(spark: SparkSession, g: LocalGraph, k: Int,
                   budget: Long, seed: Long = 7,
                   lambda: Option[Double] = None, cbar: Int = 1000,
                   doNaive: Boolean = true, doAGS: Boolean = true): Run = {
    val coloring = lambda.map(Coloring(k, _, seed)).getOrElse(Coloring.uniform(k, seed))
    val build = BuildUp.runLocalGraph(spark, g, coloring)
    val sampler = new DistSampler(spark, build,
      Graphs.edgesDF(spark, g), Graphs.edgePairsDF(spark, g), seed)
    try {
      val naive =
        if (doNaive) Some(AGS.naive(sampler, budget, batch = math.min(budget, 2048L).toInt))
        else None
      val ags = if (doAGS) Some(AGS.run(sampler, budget, cbar = cbar,
        batch = math.min(budget, 1024L).toInt)) else None
      Run(k, coloring, build.totalTreelets, naive, budget, ags)
    } finally { sampler.close(); build.unpersist() }
  }
}
