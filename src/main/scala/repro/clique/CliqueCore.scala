package repro.clique

import repro.core.InstanceSet
import scala.collection.mutable

/** (k, ψ_h)-core decomposition (Definition 5 of the paper), generalized to
  * any instance set (h-cliques or pattern occurrences).
  *
  * Peels vertices in order of current instance degree; when a vertex is
  * removed every live instance containing it dies and decrements the
  * degrees of the surviving co-members. `core(u)` is the largest k such
  * that u lies in the (k, ψ_h)-core — the initial upper bound of the
  * h-clique compact number (Proposition 3), with `core(u)/h` the initial
  * lower bound (Algorithm 1).
  *
  * Uses a lazy-deletion binary heap: unlike edge cores, an instance death
  * can drop a co-member's degree by more than one, so the classic
  * bucket-swap of Batagelj–Zaveršnik does not apply directly.
  */
object CliqueCore {

  /** Instance-core number of every vertex. Vertices in no instance get 0. */
  def coreNumbers(inst: InstanceSet): Array[Int] = {
    val n = inst.n
    val deg = inst.degrees.clone()
    val core = new Array[Int](n)
    val removed = new Array[Boolean](n)
    val instDead = new Array[Boolean](inst.size)
    // lazy min-heap of (degree, vertex); stale entries skipped on pop
    val pq = mutable.PriorityQueue.empty[(Int, Int)](Ordering.by[(Int, Int), (Int, Int)](x => (-x._1, -x._2)))
    var v = 0
    while (v < n) { pq.enqueue((deg(v), v)); v += 1 }
    var curMax = 0
    var processed = 0
    while (processed < n) {
      val (d, u) = pq.dequeue()
      if (!removed(u) && d == deg(u)) {
        curMax = math.max(curMax, d)
        core(u) = curMax
        removed(u) = true
        processed += 1
        inst.foreachInstanceOf(u) { ii =>
          if (!instDead(ii)) {
            instDead(ii) = true
            val mem = inst.members(ii)
            var j = 0
            while (j < mem.length) {
              val w = mem(j)
              if (!removed(w)) { deg(w) -= 1; pq.enqueue((deg(w), w)) }
              j += 1
            }
          }
        }
      }
    }
    core
  }

  /** Brute-force core numbers by repeated min-degree peeling — test oracle. */
  def bruteForce(inst: InstanceSet): Array[Int] = {
    val n = inst.n
    val alive = Array.fill(n)(true)
    val instAlive = Array.fill(inst.size)(true)
    val core = new Array[Int](n)
    var curMax = 0
    var remaining = n
    while (remaining > 0) {
      val deg = new Array[Int](n)
      for (i <- 0 until inst.size if instAlive(i); v <- inst.members(i)) deg(v) += 1
      var minV = -1
      for (v <- 0 until n if alive(v)) if (minV < 0 || deg(v) < deg(minV)) minV = v
      curMax = math.max(curMax, deg(minV))
      core(minV) = curMax
      alive(minV) = false
      for (i <- 0 until inst.size if instAlive(i) && inst.members(i).contains(minV))
        instAlive(i) = false
      remaining -= 1
    }
    core
  }
}
