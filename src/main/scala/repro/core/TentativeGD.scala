package repro.core

/** Tentative graph decomposition (Algorithm 2, lines 14–24).
  *
  * Sorts vertices by r descending, finds the prefix positions that are
  * suffix-maxima of prefix instance-density (the diminishingly-dense
  * decomposition proposal), and — the paper's key trick for instances that
  * span several blocks — re-assigns each spanning instance's α weight onto
  * its members in the *last* block it touches (the one with the lowest r),
  * then recomputes r. The resulting (α, r) stays feasible for CP(G, h).
  *
  * Prefix-density comparisons are done in exact Long cross-multiplication,
  * not floating point, so partition points are deterministic.
  */
object TentativeGD {

  /** Decomposition result: vertex order (r-descending), the partition
    * blocks in that order, and the per-vertex block index.
    */
  final case class GD(order: Array[Int], blocks: Array[Array[Int]], blockOf: Array[Int])

  /** Run TentativeGD, mutating `state`'s α and r in place. */
  def run(state: KClistPP.CPState): GD = {
    val inst = state.inst
    val n = inst.n
    val r = state.r
    val alpha = state.alpha

    // 1. sort vertices by r descending (ties by id for determinism)
    val order = (0 until n).sortBy(v => (-r(v), v)).toArray
    val pos = new Array[Int](n) // 0-based position in the order
    var i = 0
    while (i < order.length) { pos(order(i)) = i; i += 1 }

    // 2. per-prefix instance counts: an instance is inside prefix q iff the
    //    max position of its members is < q (q = 1..n)
    val cntAtMaxPos = new Array[Long](n)
    val instMaxPos = new Array[Int](inst.size)
    i = 0
    while (i < inst.size) {
      val mem = inst.members(i)
      var mx = 0
      var j = 0
      while (j < mem.length) { if (pos(mem(j)) > mx) mx = pos(mem(j)); j += 1 }
      instMaxPos(i) = mx
      cntAtMaxPos(mx) += 1
      i += 1
    }
    val cum = new Array[Long](n) // cum(q-1) = #instances inside prefix of length q
    var running = 0L
    i = 0
    while (i < n) { running += cntAtMaxPos(i); cum(i) = running; i += 1 }

    // 3. partition points: q in P iff density(q) >= density(q') for all q' > q,
    //    i.e. cum(q)/q is a suffix maximum (exact fraction comparison)
    val isBreak = new Array[Boolean](n)
    var bestNum = -1L // best density seen from the right, as bestNum/bestDen
    var bestDen = 1L
    i = n - 1
    while (i >= 0) {
      val q = (i + 1).toLong
      // cum(i)/q >= bestNum/bestDen  <=>  cum(i)*bestDen >= bestNum*q
      if (cum(i) * bestDen >= bestNum * q) {
        isBreak(i) = true
        bestNum = cum(i); bestDen = q
      }
      i -= 1
    }

    // 4. blocks between consecutive break positions
    val blocks = scala.collection.mutable.ArrayBuffer.empty[Array[Int]]
    val blockOf = new Array[Int](n)
    var start = 0
    i = 0
    while (i < n) {
      if (isBreak(i)) {
        val b = java.util.Arrays.copyOfRange(order, start, i + 1)
        for (v <- b) blockOf(v) = blocks.length
        blocks += b
        start = i + 1
      }
      i += 1
    }
    require(start == n, "last position must always be a break")

    // 5. re-assign α of spanning instances to the last block touched
    i = 0
    while (i < inst.size) {
      val mem = inst.members(i)
      val a = alpha(i)
      val p = blockOf(order(instMaxPos(i))) // largest block index touched
      var inP = 0
      var j = 0
      while (j < mem.length) { if (blockOf(mem(j)) == p) inP += 1; j += 1 }
      if (inP < mem.length) {
        var s = 0.0
        j = 0
        while (j < mem.length) {
          if (blockOf(mem(j)) != p) { s += a(j); a(j) = 0.0 }
          j += 1
        }
        val share = s / inP
        j = 0
        while (j < mem.length) {
          if (blockOf(mem(j)) == p) a(j) += share
          j += 1
        }
      }
      i += 1
    }

    // 6. recompute r from the re-assigned α
    java.util.Arrays.fill(r, 0.0)
    i = 0
    while (i < inst.size) {
      val mem = inst.members(i)
      val a = alpha(i)
      var j = 0
      while (j < mem.length) { r(mem(j)) += a(j); j += 1 }
      i += 1
    }

    GD(order, blocks.toArray, blockOf)
  }
}
