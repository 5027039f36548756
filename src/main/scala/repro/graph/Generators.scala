package repro.graph

import scala.collection.mutable
import scala.util.Random

/** Deterministic synthetic graph generators — the stand-ins for the paper's
  * 9 public graphs (Table 1), scaled to laptop size. Each archetype
  * stresses the phenomenon its original stresses (see DESIGN.md §4):
  * flat social graphs, hubby web graphs, near-uniform co-purchase graphs,
  * community graphs, extreme star-skew ("Yelp"), and the lollipop lower
  * bound of Theorem 5. All are deterministic in (params, seed).
  */
object Generators {

  /** Erdős–Rényi G(n, m-ish): `m` random endpoints pairs (dedup happens in
    * LocalGraph). Amazon archetype: near-uniform low degrees.
    */
  def er(n: Int, m: Int, seed: Long = 1): LocalGraph = {
    val rnd = new Random(seed)
    LocalGraph.fromEdges(n, Iterator.fill(m)((rnd.nextInt(n), rnd.nextInt(n))))
  }

  /** Chung–Lu power-law: vertex weights w_v ∝ (v+1)^(−1/(γ−1)); edges drawn
    * by weighted endpoint sampling. LiveJournal/Twitter/Friendster archetype.
    */
  def powerlaw(n: Int, m: Int, gamma: Double = 2.5, seed: Long = 2): LocalGraph = {
    val rnd = new Random(seed)
    val expo = 1.0 / (gamma - 1.0)
    val w = Array.tabulate(n)(v => math.pow(n.toDouble / (v + 1), expo))
    val cum = w.scanLeft(0.0)(_ + _)
    val tot = cum(n)
    def draw(): Int = {
      val x = rnd.nextDouble() * tot
      var lo = 0; var hi = n - 1
      while (lo < hi) { val mid = (lo + hi) >>> 1; if (cum(mid + 1) < x) lo = mid + 1 else hi = mid }
      lo
    }
    LocalGraph.fromEdges(n, Iterator.fill(m)((draw(), draw())))
  }

  /** "Social" graph: power-law plus triadic closure (each edge (u,v) also
    * closes a random wedge with probability `closure`), giving the high
    * clustering of Facebook/Orkut.
    */
  def social(n: Int, m: Int, closure: Double = 0.4, seed: Long = 3): LocalGraph = {
    val rnd = new Random(seed)
    val base = powerlaw(n, m, 2.3, seed = seed + 17)
    val extra = mutable.ArrayBuffer.empty[(Int, Int)]
    for (u <- 0 until n; v <- base.neighbors(u) if v > u if rnd.nextDouble() < closure) {
      val du = base.degree(u)
      if (du > 1) {
        val w = base.neighborAt(u, rnd.nextInt(du))
        if (w != v) extra += ((v, w))
      }
    }
    LocalGraph.fromEdges(n, base.edgePairs ++ extra.iterator)
  }

  /** Relaxed caveman: `nc` cliques of size `cs`, each edge rewired to a
    * random endpoint with probability `p`. DBLP archetype (communities).
    */
  def caveman(nc: Int, cs: Int, p: Double = 0.1, seed: Long = 4): LocalGraph = {
    val n = nc * cs
    val rnd = new Random(seed)
    val edges = for {
      c <- (0 until nc).iterator
      i <- (0 until cs).iterator
      j <- (i + 1 until cs).iterator
    } yield {
      val a = c * cs + i; val b = c * cs + j
      if (rnd.nextDouble() < p) (a, rnd.nextInt(n)) else (a, b)
    }
    LocalGraph.fromEdges(n, edges)
  }

  /** Hubby web graph: power-law base plus `hubs` vertices wired to a random
    * `hubDeg` of all vertices. BerkStan/Orkut archetype (one node with
    * degree ≫ everyone else's — the case neighbor buffering targets).
    */
  def hubby(n: Int, m: Int, hubs: Int = 2, hubDeg: Int = 500, seed: Long = 5): LocalGraph = {
    val rnd = new Random(seed)
    val base = powerlaw(n, m, 2.7, seed = seed + 31)
    val extra = for {
      h <- (0 until hubs).iterator
      _ <- (0 until hubDeg).iterator
    } yield (h, rnd.nextInt(n))
    LocalGraph.fromEdges(n, base.edgePairs ++ extra)
  }

  /** Star-skew "Yelp" archetype: a few massive stars over a very sparse
    * background, so that almost all k-graphlets are stars and naive
    * sampling sees nothing else (§5.3).
    */
  def starskew(n: Int, hubs: Int = 3, hubDeg: Int = 2000, bgEdges: Int = 2000,
               seed: Long = 6): LocalGraph = {
    val rnd = new Random(seed)
    val star = for {
      h <- (0 until hubs).iterator
      _ <- (0 until hubDeg).iterator
    } yield (h, hubs + rnd.nextInt(n - hubs))
    val bg = Iterator.fill(bgEdges)((hubs + rnd.nextInt(n - hubs), hubs + rnd.nextInt(n - hubs)))
    LocalGraph.fromEdges(n, star ++ bg)
  }

  /** Lollipop of Theorem 5: a clique on n−tail nodes plus a dangling path
    * of `tail` nodes. The k-path graphlet has Θ(n) copies while the k-path
    * treelet has Θ(n^k) — the worst case for any sample(T) strategy.
    */
  def lollipop(n: Int, tail: Int): LocalGraph = {
    val cliqueN = n - tail
    require(cliqueN >= 2 && tail >= 1)
    val clique = for {
      i <- (0 until cliqueN).iterator
      j <- (i + 1 until cliqueN).iterator
    } yield (i, j)
    val path = (0 until tail).iterator.map { i =>
      val a = if (i == 0) cliqueN - 1 else cliqueN + i - 1
      (a, cliqueN + i)
    }
    LocalGraph.fromEdges(n, clique ++ path)
  }

  /** Ring with random chords — tiny, structured; used in unit tests. */
  def ringChords(n: Int, chords: Int, seed: Long = 7): LocalGraph = {
    val rnd = new Random(seed)
    val ring = (0 until n).iterator.map(i => (i, (i + 1) % n))
    val chord = Iterator.fill(chords)((rnd.nextInt(n), rnd.nextInt(n)))
    LocalGraph.fromEdges(n, ring ++ chord)
  }

  /** Complete graph K_n (tests). */
  def clique(n: Int): LocalGraph =
    LocalGraph.fromEdges(n, for { i <- (0 until n).iterator; j <- (i + 1 until n).iterator } yield (i, j))

  /** The benchmark suite: name → graph, mirroring the paper's Table 1
    * (scaled ~1000×; see DESIGN.md §4 for the mapping).
    */
  def benchmarkSuite(scale: Double = 1.0): Seq[(String, String, LocalGraph)] = {
    def s(x: Int): Int = math.max(4, (x * scale).toInt)
    Seq(
      ("facebook-lite", "Facebook", social(s(1000), s(8000), seed = 11)),
      ("berkstan-lite", "BerkStan", hubby(s(2000), s(9000), hubs = 2, hubDeg = s(600), seed = 12)),
      ("amazon-lite", "Amazon", er(s(2000), s(6000), seed = 13)),
      ("dblp-lite", "DBLP", caveman(s(2000) / 8, 8, 0.1, seed = 14)),
      ("orkut-lite", "Orkut", social(s(1500), s(15000), closure = 0.5, seed = 15)),
      ("livejournal-lite", "LiveJournal", powerlaw(s(5000), s(20000), seed = 16)),
      ("yelp-lite", "Yelp", starskew(s(6000), hubs = 3, hubDeg = s(2000), bgEdges = s(1500), seed = 17)),
      ("twitter-lite", "Twitter", powerlaw(s(10000), s(40000), gamma = 2.2, seed = 18)),
      ("friendster-lite", "Friendster", powerlaw(s(20000), s(60000), gamma = 2.6, seed = 19)),
    )
  }
}
