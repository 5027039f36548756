package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Table 1 (datasets): prints the stand-in statistics and sanity-checks the
  * archetypes preserve their defining structure.
  */
class Table1DatasetsBench extends SparkSpec {

  private val scale = 0.5

  test("Table 1: dataset statistics") {
    val rows = Experiments.table1(scale)
    println(Experiments.table1Text(scale))
    assert(rows.size == 9)
    // scaling sanity: node ordering matches the paper's Table 1 ordering
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("friendster-lite").n > byName("facebook-lite").n)
    assert(byName("twitter-lite").m > byName("amazon-lite").m)
    // the Yelp archetype keeps its extreme hub skew
    val yelp = byName("yelp-lite")
    assert(yelp.maxDeg > yelp.m / 10, s"yelp hub degree ${yelp.maxDeg} vs m ${yelp.m}")
  }
}
