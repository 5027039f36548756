package repro.treelet

/** Succinct rooted-treelet codec (paper §3.1, "Motivo's treelets").
  *
  * A rooted treelet T on h ≤ 16 nodes is encoded as the DFS bitstring s_T:
  * the i-th bit is 1 if the i-th edge traversal moves away from the root and
  * 0 if it moves towards it. Children of every node are visited in ascending
  * order of their subtree encodings, which makes the encoding canonical. The
  * bitstring (a Dyck word of length 2(h−1) ≤ 30) is packed MSB-first into an
  * Int starting at bit 31; unsigned integer comparison of codes equals the
  * lexicographic order on the strings (valid Dyck words cannot collide after
  * zero-padding), which is the total order the count table sorts by.
  *
  * All operations are a handful of bit instructions, mirroring the paper:
  * `size` is POPCNT+1, `merge` is shift-and-or, `decomp` / `beta` are short
  * bit scans.
  */
object Treelet {

  /** The trivial treelet on one node (empty DFS string). */
  final val Singleton: Int = 0

  /** Number of vertices of the treelet: 1 + number of 1-bits. */
  @inline def size(t: Int): Int = Integer.bitCount(t) + 1

  /** Length in bits of the DFS string: 2·(size−1). */
  @inline def bitLength(t: Int): Int = 2 * Integer.bitCount(t)

  /** Unsigned comparison of codes = lexicographic order of DFS strings. */
  @inline def compare(a: Int, b: Int): Int = Integer.compareUnsigned(a, b)

  /** Merge t2 as the new first child of the root of t1: s = 1 · s_{t2} · 0 · s_{t1}.
    * The caller must ensure [[canMerge]] holds for the result to be canonical.
    */
  def merge(t1: Int, t2: Int): Int = {
    val l2 = bitLength(t2)
    0x80000000 | (t2 >>> 1) | (if (t1 == 0) 0 else t1 >>> (l2 + 2))
  }

  /** Decompose T into (T', T''): T'' is the first-child subtree of the root,
    * T' is T with that subtree removed. Inverse of [[merge]]. Requires t != 0.
    */
  def decomp(t: Int): (Int, Int) = {
    require(t != 0, "cannot decompose the singleton treelet")
    // Scan from bit 30: find where the balance opened by bit 31 returns to 0.
    var bal = 1
    var i = 30
    while (bal > 0) {
      if (((t >>> i) & 1) == 1) bal += 1 else bal -= 1
      i -= 1
    }
    val p = i + 1 // position of the closing 0 of the first child
    val l2 = 30 - p // first child's own DFS-string length
    val t2 = if (l2 == 0) 0 else (t << 1) & (-1 << (32 - l2))
    val t1 = t << (32 - p) // remaining word, re-left-aligned (may be 0)
    (t1, t2)
  }

  /** True iff merging t2 below the root of t1 yields a canonical encoding:
    * t1 is childless, or t2 precedes (≤) t1's current first child.
    */
  def canMerge(t1: Int, t2: Int): Boolean =
    t1 == 0 || Integer.compareUnsigned(t2, decomp(t1)._2) <= 0

  /** β_T of Eq. (1): the number of subtrees of T isomorphic to T'' (the
    * first-child subtree) rooted at a child of the root. Because children are
    * sorted, these form the leading run of equal child encodings.
    */
  def beta(t: Int): Int = {
    val (rest0, t2) = decomp(t)
    var b = 1
    var rest = rest0
    var go = true
    while (go && rest != 0) {
      val (r, c) = decomp(rest)
      if (c == t2) { b += 1; rest = r } else go = false
    }
    b
  }

  /** Child subtrees of the root, in encoding order (ascending). */
  def children(t: Int): List[Int] = {
    var rest = t
    val buf = List.newBuilder[Int]
    while (rest != 0) {
      val (r, c) = decomp(rest)
      buf += c
      rest = r
    }
    buf.result()
  }

  /** Canonical code of the rooted tree whose root has the given child
    * subtrees (each already canonical). Order-insensitive.
    */
  def ofChildren(cs: Seq[Int]): Int = {
    // merge() prepends, so add children from largest to smallest.
    val sorted = cs.sortWith((a, b) => Integer.compareUnsigned(a, b) > 0)
    var t = Singleton
    for (c <- sorted) t = merge(t, c)
    t
  }

  /** Validity: left-aligned Dyck word — balanced, never negative, and no
    * stray bits below the string.
    */
  def isValid(t: Int): Boolean = {
    val l = bitLength(t)
    if (l > 30) return false
    if (l < 32 && (t & ((1 << (32 - l)) - 1)) != 0) return false
    var bal = 0
    var i = 31
    while (i >= 32 - l) {
      if (((t >>> i) & 1) == 1) bal += 1 else bal -= 1
      if (bal < 0) return false
      i -= 1
    }
    bal == 0
  }

  /** Human-readable DFS string, e.g. "1100" for the path on 3 nodes. */
  def toBitString(t: Int): String = {
    val l = bitLength(t)
    (0 until l).map(i => (t >>> (31 - i)) & 1).mkString
  }

  /** Decode into a parent array in DFS order: parent(0) = −1 for the root.
    * Node indices are assigned in DFS visiting order.
    */
  def toParents(t: Int): Array[Int] = {
    val h = size(t)
    val par = new Array[Int](h)
    par(0) = -1
    var cur = 0 // current node during the walk
    var next = 1 // next node id to assign
    val l = bitLength(t)
    var i = 0
    while (i < l) {
      if (((t >>> (31 - i)) & 1) == 1) { par(next) = cur; cur = next; next += 1 }
      else cur = par(cur)
      i += 1
    }
    par
  }

  /** Canonical rooted code of the tree given by a parent array, rooted at
    * `root` (re-rooting supported: `adj` is derived from the parent array).
    */
  def canonicalFromParents(par: Array[Int], root: Int): Int = {
    val n = par.length
    val adj = Array.fill(n)(List.empty[Int])
    for (v <- 1 until n if par(v) >= 0) {
      adj(par(v)) ::= v
      adj(v) ::= par(v)
    }
    // also handle root with par(root) == -1 at index != 0 (generic parents)
    def enc(v: Int, from: Int): Int =
      ofChildren(adj(v).filter(_ != from).map(c => enc(c, v)))
    enc(root, -1)
  }
}
