package repro.color

import repro.SparkSpec

/** Color assignment + colorful-probability invariants (paper §2, §3.4). */
class ColoringSpec extends SparkSpec {

  test("colorOf is always in range") {
    for (k <- 2 to 8; seed <- Seq(1L, 2L)) {
      val c = Coloring.uniform(k, seed)
      for (v <- 0L until 5000L) {
        val col = c.colorOf(v)
        assert(col >= 0 && col < k)
      }
    }
  }

  test("colorOf is deterministic in (v, seed)") {
    val a = Coloring.uniform(5, 42)
    val b = Coloring.uniform(5, 42)
    val c = Coloring.uniform(5, 43)
    val vs = (0L until 1000L)
    assert(vs.map(a.colorOf) == vs.map(b.colorOf))
    assert(vs.map(a.colorOf) != vs.map(c.colorOf))
  }

  test("uniform coloring is roughly balanced") {
    val k = 5
    val c = Coloring.uniform(k, 7)
    val n = 50000
    val freq = (0L until n.toLong).map(c.colorOf).groupBy(identity).view.mapValues(_.size).toMap
    for (col <- 0 until k) {
      val f = freq.getOrElse(col, 0).toDouble / n
      assert(math.abs(f - 1.0 / k) < 0.02, s"color $col freq $f")
    }
  }

  test("biased coloring matches the lambda distribution") {
    val k = 6; val lambda = 0.03
    val c = Coloring(k, lambda, 9)
    val n = 100000
    val freq = (0L until n.toLong).map(c.colorOf).groupBy(identity).view.mapValues(_.size).toMap
    val fHeavy = freq.getOrElse(k - 1, 0).toDouble / n
    assert(math.abs(fHeavy - (1 - (k - 1) * lambda)) < 0.01, s"heavy color freq $fHeavy")
    for (col <- 0 until k - 1) {
      val f = freq.getOrElse(col, 0).toDouble / n
      assert(math.abs(f - lambda) < 0.005, s"color $col freq $f")
    }
    // color 0 (the rooting color) must be one of the rare colors
    assert(freq.getOrElse(0, 0).toDouble / n < 2 * lambda)
  }

  test("pColorful for uniform coloring is k!/k^k") {
    def fact(x: Int) = (2 to x).foldLeft(1.0)(_ * _)
    for (k <- 2 to 8) {
      val c = Coloring.uniform(k, 1)
      val expected = fact(k) / math.pow(k, k)
      assert(math.abs(c.pColorful - expected) < 1e-12, s"k=$k")
    }
  }

  test("pColorful for biased coloring matches k!·λ^{k-1}(1−(k−1)λ)") {
    val k = 5; val lambda = 0.02
    val c = Coloring(k, lambda, 1)
    val expected = 120.0 * math.pow(lambda, 4) * (1 - 4 * lambda)
    assert(math.abs(c.pColorful - expected) < 1e-15)
  }

  test("pColorful empirically: fraction of colorful k-sets under the hash") {
    val k = 4
    val c = Coloring.uniform(k, 3)
    val rnd = new scala.util.Random(1)
    val trials = 200000
    var colorful = 0
    for (_ <- 1 to trials) {
      // k distinct random vertex ids
      val vs = Array.fill(k)(rnd.nextLong(1L << 40))
      val mask = vs.foldLeft(0)((m, v) => m | (1 << c.colorOf(v)))
      if (Integer.bitCount(mask) == k) colorful += 1
    }
    val f = colorful.toDouble / trials
    assert(math.abs(f - c.pColorful) < 0.01, s"empirical $f vs ${c.pColorful}")
  }

  test("Spark colorColumn agrees with driver-side colorOf") {
    val c = Coloring(6, 0.05, 11)
    val df = c.colorsDF(spark, 2000L).collect()
    assert(df.length == 2000)
    for (row <- df) {
      val v = row.getLong(0)
      assert(row.getInt(1) == c.colorOf(v), s"v=$v")
    }
  }

  test("invalid parameters are rejected") {
    intercept[IllegalArgumentException](Coloring(1, 0.5, 1))
    intercept[IllegalArgumentException](Coloring(5, 0.0, 1))
    intercept[IllegalArgumentException](Coloring(5, 0.3, 1)) // (k-1)λ > 1
  }
}
