package repro.treelet

import scala.collection.mutable

/** Enumeration and shape utilities for treelets.
  *
  * - rooted trees of a given size (canonical codes), used by tests and by
  *   the sampling phase to organize the count table;
  * - free-tree canonicalization (root at the centroid), which defines the
  *   treelet *types* T_j of AGS (§4): two rooted codes have the same free
  *   shape iff they are isomorphic as unrooted trees.
  */
object TreeletEnum {

  private val rootedCache = mutable.HashMap.empty[Int, Vector[Int]]
  private val freeCache   = mutable.HashMap.empty[Int, Vector[Int]]
  private val freeOfCache =
    new java.util.concurrent.ConcurrentHashMap[Integer, Integer]()

  /** All canonical rooted treelet codes on `h` nodes (A000081: 1,1,2,4,9,20,48,115,286…). */
  def rootedTrees(h: Int): Vector[Int] = synchronized {
    rootedCache.getOrElseUpdate(h, computeRooted(h))
  }

  private def computeRooted(h: Int): Vector[Int] = {
    if (h == 1) return Vector(Treelet.Singleton)
    // A rooted tree of size h = smaller tree t1 (size h-h2) with a new first
    // child t2 (size h2) where canMerge holds. Generate bottom-up, dedupe.
    val out = mutable.LinkedHashSet.empty[Int]
    for (h2 <- 1 until h) {
      val h1 = h - h2
      for (t1 <- rootedTrees(h1); t2 <- rootedTrees(h2) if Treelet.canMerge(t1, t2))
        out += Treelet.merge(t1, t2)
    }
    out.toVector.sortWith((a, b) => Integer.compareUnsigned(a, b) < 0)
  }

  /** All free (unrooted) treelet shapes on `h` nodes, as canonical
    * centroid-rooted codes (A000055: 1,1,1,2,3,6,11,23,47…).
    */
  def freeTrees(h: Int): Vector[Int] = synchronized {
    freeCache.getOrElseUpdate(h,
      rootedTrees(h).map(freeShape).distinct
        .sortWith((a, b) => Integer.compareUnsigned(a, b) < 0))
  }

  /** Canonical free-shape code of a rooted code: re-root at the centroid
    * (minimum code over the ≤2 centroids). Memoized — called per sampled
    * treelet in AGS.
    */
  def freeShape(t: Int): Int = {
    val cached = freeOfCache.get(t)
    if (cached != null) return cached.intValue
    val par = Treelet.toParents(t)
    val n = par.length
    val res =
      if (n == 1) Treelet.Singleton
      else {
        val cs = centroids(par)
        cs.map(c => Treelet.canonicalFromParents(par, c))
          .reduce((a, b) => if (Integer.compareUnsigned(a, b) <= 0) a else b)
      }
    freeOfCache.put(t, res)
    res
  }

  /** Centroid(s) of the tree given by a DFS-order parent array. */
  def centroids(par: Array[Int]): Seq[Int] = {
    val n = par.length
    val sz = Array.fill(n)(1)
    // DFS order ⇒ children have larger indices; accumulate sizes bottom-up.
    for (v <- n - 1 until 0 by -1) sz(par(v)) += sz(v)
    val best = (0 until n).map { v =>
      // max component size when v is removed
      var mx = n - sz(v) // the side towards the parent
      // children of v are exactly nodes with par == v
      for (u <- 0 until n if par(u) == v) mx = math.max(mx, sz(u))
      (v, mx)
    }
    val m = best.map(_._2).min
    best.filter(_._2 == m).map(_._1)
  }

  /** Path on h nodes, rooted at an endpoint (handy in tests/benches). */
  def pathRooted(h: Int): Int =
    (1 until h).foldLeft(Treelet.Singleton)((t, _) => Treelet.merge(Treelet.Singleton, t))

  /** Star on h nodes, rooted at the center. */
  def starRooted(h: Int): Int =
    (1 until h).foldLeft(Treelet.Singleton)((t, _) => Treelet.merge(t, Treelet.Singleton))
}
