package repro.core

import scala.util.Random

/** Vose's alias method [24]: O(n) build, O(1) draws from a fixed discrete
  * distribution. Used for root sampling (paper §3.3, "Alias method
  * sampling"); rebuilt per treelet shape in AGS, as in the paper.
  */
final class Alias private (prob: Array[Double], alias: Array[Int]) {
  def size: Int = prob.length
  def draw(rnd: Random): Int = {
    val i = rnd.nextInt(prob.length)
    if (rnd.nextDouble() < prob(i)) i else alias(i)
  }
}

object Alias {
  def apply(weights: Array[Double]): Alias = {
    val n = weights.length
    require(n > 0, "empty alias distribution")
    val sum = weights.sum
    require(sum > 0, "alias distribution has zero mass")
    val p = weights.map(w => w * n / sum)
    val prob = new Array[Double](n)
    val alias = new Array[Int](n)
    val small = collection.mutable.Stack.empty[Int]
    val large = collection.mutable.Stack.empty[Int]
    for (i <- 0 until n) (if (p(i) < 1.0) small else large).push(i)
    while (small.nonEmpty && large.nonEmpty) {
      val s = small.pop(); val l = large.pop()
      prob(s) = p(s); alias(s) = l
      p(l) = (p(l) + p(s)) - 1.0
      (if (p(l) < 1.0) small else large).push(l)
    }
    while (large.nonEmpty) { val l = large.pop(); prob(l) = 1.0; alias(l) = l }
    while (small.nonEmpty) { val s = small.pop(); prob(s) = 1.0; alias(s) = s }
    new Alias(prob, alias)
  }
}
