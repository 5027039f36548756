package repro.core

import repro.graphlet.SpanningTrees
import scala.collection.mutable

/** Estimators and error metrics (paper §2.2 "Estimators and errors", §5.2).
  *
  * A sample is a colorful k-treelet copy drawn u.a.r.; its induced graphlet
  * H_i is observed with probability c_i σ_i / t, so from hit counts the
  * number of colorful copies is ĉ_i = (hits_i / S) · t / σ_i, and the
  * uncolored count is ĝ_i = ĉ_i / p_k (unbiased; Theorems 2–3 bound the
  * deviation).
  */
object Estimators {

  /** Naive-sampling count estimates from canonical-code hits.
    *
    * @param hits      canonical graphlet code → number of samples
    * @param samples   total number of samples S
    * @param t         total colorful k-treelet copies
    * @param k         graphlet size
    * @param pColorful P[k fixed vertices colorful] (k!/k^k uniform, §3.4 biased)
    */
  def naiveCounts(hits: Map[Long, Long], samples: Long, t: BigInt, k: Int,
                  pColorful: Double): Map[Long, Double] = {
    require(samples > 0)
    hits.map { case (code, h) =>
      val sigma = SpanningTrees.sigma(code, k).toDouble
      code -> (h.toDouble / samples.toDouble) * (t.toDouble / sigma) / pColorful
    }
  }

  /** Relative count error err_H = (ĉ_H − c_H) / c_H (Eq. 4). A graphlet
    * missing from the estimates has err_H = −1 ("missed").
    */
  def errH(estimates: Map[Long, Double], truth: Map[Long, Double]): Map[Long, Double] =
    truth.map { case (code, c) => code -> ((estimates.getOrElse(code, 0.0) - c) / c) }

  /** ℓ1 distance between the *frequency* vectors (paper: "Error in ℓ1
    * norm"): Σ_i |f̂_i − f_i| where f are counts normalized to sum 1.
    */
  def l1Error(estimates: Map[Long, Double], truth: Map[Long, Double]): Double = {
    val te = estimates.values.sum
    val tt = truth.values.sum
    if (tt == 0) return 0.0
    val codes = estimates.keySet ++ truth.keySet
    codes.iterator.map { c =>
      val fe = if (te == 0) 0.0 else estimates.getOrElse(c, 0.0) / te
      val ft = truth.getOrElse(c, 0.0) / tt
      math.abs(fe - ft)
    }.sum
  }

  /** Number of graphlets with |err_H| ≤ tol (the ±50% metric of Fig. 9). */
  def accurateCount(estimates: Map[Long, Double], truth: Map[Long, Double],
                    tol: Double = 0.5): Int =
    errH(estimates, truth).count { case (_, e) => math.abs(e) <= tol }

  /** Frequency (within the truth distribution) of the rarest graphlet that
    * got at least `minHits` samples — the Fig. 10 metric.
    */
  def rarestFound(hits: Map[Long, Long], truth: Map[Long, Double], minHits: Int = 10): Option[Double] = {
    val tt = truth.values.sum
    if (tt == 0) return None
    val freqs = for {
      (code, h) <- hits.iterator if h >= minHits
      c <- truth.get(code)
    } yield c / tt
    freqs.minOption
  }

  /** ℓ2 norm of a frequency distribution — the paper's skew proxy (§5.3):
    * AGS wins on high-ℓ2 (skewed) graphs.
    */
  def l2Norm(truth: Map[Long, Double]): Double = {
    val tt = truth.values.sum
    if (tt == 0) 0.0
    else math.sqrt(truth.values.map(c => { val f = c / tt; f * f }).sum)
  }

  /** Fold a sequence of sampled codes into a hit map. */
  def tally(codes: IterableOnce[Long]): Map[Long, Long] = {
    val m = mutable.HashMap.empty[Long, Long].withDefaultValue(0L)
    codes.iterator.foreach(c => m(c) += 1)
    m.toMap
  }
}
