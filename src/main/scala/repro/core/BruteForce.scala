package repro.core

import repro.graph.LocalGraph

/** Exhaustive ground truth for tiny graphs (n ≤ ~14): exact compactness,
  * compact numbers, and the full LhCDS set by subset enumeration.
  * Everything is exact rational arithmetic (Long numerator/denominator).
  * Only used by tests and by test-style cross-checks in benches.
  */
object BruteForce {

  /** a/b < c/d for non-negative rationals with positive denominators. */
  @inline def ratLt(a: Long, b: Long, c: Long, d: Long): Boolean = a * d < c * b
  @inline def ratLe(a: Long, b: Long, c: Long, d: Long): Boolean = a * d <= c * b
  @inline def ratEq(a: Long, b: Long, c: Long, d: Long): Boolean = a * d == c * b

  /** Per-subset instance counts: cnt(mask) = #instances fully inside mask. */
  def subsetInstanceCounts(n: Int, inst: InstanceSet): Array[Int] = {
    require(n <= 20, "bitmask brute force limited to n <= 20")
    val instMasks = inst.members.map(_.foldLeft(0)((m, v) => m | (1 << v)))
    val cnt = new Array[Int](1 << n)
    var s = 0
    while (s < (1 << n)) {
      var c = 0
      var i = 0
      while (i < instMasks.length) {
        if ((instMasks(i) & ~s) == 0) c += 1
        i += 1
      }
      cnt(s) = c
      s += 1
    }
    cnt
  }

  /** Is the induced subgraph on `mask` connected (and nonempty)? */
  def connectedMask(g: LocalGraph, mask: Int): Boolean = {
    if (mask == 0) return false
    val start = Integer.numberOfTrailingZeros(mask)
    var seen = 1 << start
    var frontier = seen
    while (frontier != 0) {
      var next = 0
      var f = frontier
      while (f != 0) {
        val v = Integer.numberOfTrailingZeros(f)
        f &= f - 1
        g.foreachNeighbor(v) { w =>
          val bit = 1 << w
          if ((mask & bit) != 0 && (seen & bit) == 0) { seen |= bit; next |= bit }
        }
      }
      frontier = next
    }
    seen == mask
  }

  /** Exact compactness of G[mask] as a rational (num, den): the largest ρ
    * such that removing any nonempty X ⊆ mask removes ≥ ρ|X| instances.
    * Requires G[mask] connected (not checked here). Compactness is
    * min over proper subsets S' ⊂ mask of (cnt(mask)−cnt(S'))/(|mask|−|S'|).
    */
  def compactness(cnt: Array[Int], mask: Int): (Long, Long) = {
    val total = cnt(mask).toLong
    val size = Integer.bitCount(mask)
    var bestNum = total
    var bestDen = size.toLong // X = everything: removes all instances
    // enumerate proper sub-masks
    var sub = (mask - 1) & mask
    while (sub != 0) {
      val remNum = total - cnt(sub)
      val remDen = (size - Integer.bitCount(sub)).toLong
      if (ratLt(remNum, remDen, bestNum, bestDen)) { bestNum = remNum; bestDen = remDen }
      sub = (sub - 1) & mask
    }
    (bestNum, bestDen)
  }

  /** Exact h-clique compact number φ(v) of every vertex: max compactness
    * over connected subsets containing v.
    */
  def compactNumbers(g: LocalGraph, inst: InstanceSet): Array[(Long, Long)] = {
    val n = g.n
    val cnt = subsetInstanceCounts(n, inst)
    val phi = Array.fill(n)((0L, 1L))
    var mask = 1
    while (mask < (1 << n)) {
      if (connectedMask(g, mask)) {
        val (cn, cd) = compactness(cnt, mask)
        var v = 0
        while (v < n) {
          if ((mask & (1 << v)) != 0 && ratLt(phi(v)._1, phi(v)._2, cn, cd))
            phi(v) = (cn, cd)
          v += 1
        }
      }
      mask += 1
    }
    phi
  }

  /** All LhCDSes of the instance set, sorted by density descending (ties:
    * lexicographic vertex sets). Definition 2: G[S] is connected,
    * d(G[S])-compact, and no connected superset is d(G[S])-compact.
    * Zero-density subgraphs are excluded (matching the IPPV driver, which
    * reports positive-density LhCDSes only).
    */
  def allLhCDS(g: LocalGraph, inst: InstanceSet): Seq[(Array[Int], Long, Long)] = {
    val n = g.n
    val cnt = subsetInstanceCounts(n, inst)
    val full = (1 << n) - 1
    val conn = Array.tabulate(1 << n)(m => m != 0 && connectedMask(g, m))
    val results = scala.collection.mutable.ArrayBuffer.empty[(Array[Int], Long, Long)]
    var mask = 1
    while (mask <= full) {
      if (conn(mask) && cnt(mask) > 0) {
        val num = cnt(mask).toLong
        val den = Integer.bitCount(mask).toLong
        val (compNum, compDen) = compactness(cnt, mask)
        // d(S)-compact <=> compactness >= density (equality by Prop. 1)
        if (!ratLt(compNum, compDen, num, den)) {
          // maximality: no connected strict superset that is (num/den)-compact
          var maximal = true
          var sup = (mask + 1) | mask
          while (maximal && sup <= full) {
            if ((sup & mask) == mask && sup != mask && conn(sup)) {
              val (sn, sd) = compactness(cnt, sup)
              if (!ratLt(sn, sd, num, den)) maximal = false
            }
            sup = (sup + 1) | mask
          }
          if (maximal)
            results += (((0 until n).filter(v => (mask & (1 << v)) != 0).toArray, num, den))
        }
      }
      mask += 1
    }
    results.sortBy { case (vs, num, den) => (-num.toDouble / den, vs.mkString(",")) }.toSeq
  }
}
