package repro.core

import repro.graphlet.SpanningTrees
import scala.collection.mutable

/** The sampling interface AGS needs: an urn that can be queried per
  * free k-treelet shape — `sample(T)` of §4. Implemented by the local
  * Motivo table and by the distributed Spark sampler.
  */
trait ShapeSampling {
  def k: Int
  /** r_j: number of colorful copies per free treelet shape (Double is ample
    * for the greedy ratios; the exact totals stay with the estimators).
    */
  def totalsByShape: Map[Int, Double]
  /** Draw `b` samples restricted to shape `j` (None = unrestricted),
    * returning canonical induced-graphlet codes.
    */
  def sampleBatch(shape: Option[Int], b: Int): Seq[Long]
}

/** Adaptive Graphlet Sampling (paper §4, Algorithm AGS).
  *
  * The greedy fractional-set-cover loop: sample from the treelet shape
  * T_j that currently maximizes the probability of seeing an *uncovered*
  * graphlet (equivalently, minimizes (1/r_j) Σ_{i∈C} σ_ij·ĝ_i over covered
  * graphlets C — line 14); a graphlet is covered once it appears in c̄
  * samples. Estimates are ĝ_i = c_i / w_i with weights
  * w_i = Σ_j N_j σ_ij / r_j, accumulated lazily from the per-shape sample
  * counts N_j (exact regardless of interleaving, since σ and r are fixed;
  * this avoids needing σ_ij for graphlets never observed).
  *
  * Deviations from the listing, documented in DESIGN.md: samples are drawn
  * in batches of `batch` (throughput; the paper notes j* only changes when
  * coverage changes, Appendix C), and the loop stops on a sample budget or
  * when every shape is ≥ `saturation` covered (the listing's |C| = s never
  * happens when some graphlets have zero copies).
  */
object AGS {

  final case class AGSResult(
      hits: Map[Long, Long],          // canonical code -> c_i
      weights: Map[Long, Double],     // canonical code -> w_i
      colorfulEstimates: Map[Long, Double], // c_i / w_i  (colorful copies ĝ_i)
      samplesTaken: Long,
      samplesByShape: Map[Int, Long], // N_j
      covered: Set[Long]) {

    /** Uncolored count estimates: (c_i/w_i) / p_k. */
    def counts(pColorful: Double): Map[Long, Double] =
      colorfulEstimates.map { case (c, e) => c -> e / pColorful }
  }

  def run(sampler: ShapeSampling,
          budget: Long,
          cbar: Int = 1000,
          batch: Int = 256,
          saturation: Double = 0.9999,
          verbose: Boolean = false): AGSResult = {
    val k = sampler.k
    val r = sampler.totalsByShape.filter(_._2 > 0)
    require(r.nonEmpty, "urn is empty")
    val shapes = r.keys.toArray

    val hits = mutable.HashMap.empty[Long, Long].withDefaultValue(0L)
    val nByShape = mutable.HashMap.empty[Int, Long].withDefaultValue(0L)
    val covered = mutable.HashSet.empty[Long]
    val sigmaOf = mutable.HashMap.empty[Long, Map[Int, Long]] // σ_{i·} cache

    def sigma(code: Long): Map[Int, Long] =
      sigmaOf.getOrElseUpdate(code, SpanningTrees.sigmaByShape(code, k))

    def weightOf(code: Long): Double = {
      val s = sigma(code)
      shapes.iterator.map(j => nByShape(j).toDouble * s.getOrElse(j, 0L).toDouble / r(j)).sum
    }

    /** Line 14: expected covered probability of sample(T_j), using current
      * estimates ĝ_i = c_i / w_i for covered graphlets.
      */
    def coveredProb(j: Int): Double = {
      var p = 0.0
      for (code <- covered) {
        val sij = sigma(code).getOrElse(j, 0L).toDouble
        if (sij > 0) {
          val w = weightOf(code)
          if (w > 0) p += sij * (hits(code).toDouble / w) / r(j)
        }
      }
      p
    }

    def pickShape(): Int = {
      if (covered.isEmpty) shapes.maxBy(r) // line 5: start anywhere; most mass first
      else shapes.minBy(j => (coveredProb(j), -r(j)))
    }

    var current = pickShape()
    var taken = 0L
    var done = false
    while (taken < budget && !done) {
      val b = math.min(batch.toLong, budget - taken).toInt
      val codes = sampler.sampleBatch(Some(current), b)
      taken += codes.size
      nByShape(current) += codes.size
      var newlyCovered = false
      for (c <- codes) {
        hits(c) += 1
        if (hits(c) == cbar) { covered += c; newlyCovered = true }
      }
      if (newlyCovered) {
        current = pickShape()
        if (verbose)
          Console.err.println(s"[AGS] covered=${covered.size} taken=$taken -> shape ${Integer.toHexString(current)}")
        // Saturation stop: every shape's mass is (estimated) almost all covered.
        if (shapes.forall(j => coveredProb(j) >= saturation)) done = true
      }
    }

    val w = hits.keys.map(c => c -> weightOf(c)).toMap
    val est = hits.collect { case (c, h) if w(c) > 0 => c -> h.toDouble / w(c) }.toMap
    AGSResult(hits.toMap, w, est, taken, nByShape.toMap, covered.toSet)
  }

  /** Naive sampling through the same interface: unrestricted draws, CC's
    * estimator (§2.2) applied by [[Estimators.naiveCounts]].
    */
  def naive(sampler: ShapeSampling, budget: Long, batch: Int = 1024): Map[Long, Long] = {
    val hits = mutable.HashMap.empty[Long, Long].withDefaultValue(0L)
    var taken = 0L
    while (taken < budget) {
      val b = math.min(batch.toLong, budget - taken).toInt
      val codes = sampler.sampleBatch(None, b)
      codes.foreach(c => hits(c) += 1)
      taken += codes.size
    }
    hits.toMap
  }
}
