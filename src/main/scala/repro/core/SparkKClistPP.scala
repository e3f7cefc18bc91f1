package repro.core

import org.apache.spark.sql.SparkSession
import org.apache.spark.storage.StorageLevel

/** Distributed kClist++ rounds — the parallel variant of the propose-phase
  * Frank–Wolfe iterations, run as per-partition computation over an RDD of
  * (members, α) records with a broadcast snapshot of r.
  *
  * One round: every instance rescales its α by (1 − γ_t) and gives γ_t to
  * its poorest member *under the round-start snapshot of r* (the parallel
  * kClist++ of Sun et al.; the sequential in-round updates of SEQ-kClist++
  * do not distribute). The new r is then
  * `r ← (1 − γ_t) r + γ_t · wins(v)` where wins counts the instances whose
  * argmin was v — a single shuffle per round. Both variants produce
  * feasible (α, r), so Theorem-4 bounds (and hence IPPV's exactness) hold
  * for either; only convergence speed differs (documented in DESIGN.md).
  */
object SparkKClistPP {

  /** Run `iters` distributed rounds and return a local CPState whose α is
    * aligned with `inst.members` (lexicographic instance order).
    */
  def run(spark: SparkSession, inst: InstanceSet, iters: Int): KClistPP.CPState = {
    val sc = spark.sparkContext
    val h = inst.h
    val n = inst.n
    val slices = math.max(1, math.min(sc.defaultParallelism, inst.size / 256 + 1))

    var cur = sc.parallelize(
      inst.members.map(m => (m, Array.fill(h)(1.0 / h))).toIndexedSeq, slices)
      .persist(StorageLevel.MEMORY_AND_DISK)
    val r = inst.degrees.map(_.toDouble / h)

    var t = 0
    while (t < iters) {
      t += 1
      val gamma = 1.0 / (t + 1)
      val keep = 1.0 - gamma
      val rB = sc.broadcast(r.clone())
      val paired = cur.mapPartitions { it =>
        val rSnap = rB.value
        it.map { case (mem, alpha) =>
          val a2 = new Array[Double](alpha.length)
          var j = 0
          while (j < alpha.length) { a2(j) = alpha(j) * keep; j += 1 }
          var minJ = 0
          j = 1
          while (j < mem.length) {
            if (rSnap(mem(j)) < rSnap(mem(minJ))) minJ = j
            j += 1
          }
          a2(minJ) += gamma
          ((mem, a2), mem(minJ))
        }
      }.persist(StorageLevel.MEMORY_AND_DISK)
      val wins = paired.map(x => (x._2, 1L)).reduceByKey(_ + _).collect()
      var v = 0
      while (v < n) { r(v) *= keep; v += 1 }
      wins.foreach { case (vv, c) => r(vv) += gamma * c }
      // localCheckpoint truncates the lineage so later rounds never
      // re-serialize this round's closure (and its broadcast r snapshot)
      val next = paired.map(_._1).persist(StorageLevel.MEMORY_AND_DISK).localCheckpoint()
      next.count() // materialize before dropping the parents
      cur.unpersist(blocking = false)
      paired.unpersist(blocking = false)
      rB.unpersist(blocking = false)
      cur = next
    }

    // collect and realign with inst.members order
    val collected = cur.collect()
    cur.unpersist(blocking = false)
    val byKey = collected.sortWith { case ((m1, _), (m2, _)) =>
      var i = 0
      var r = 0
      while (r == 0 && i < m1.length) { r = Integer.compare(m1(i), m2(i)); i += 1 }
      r < 0
    }

    val state = new KClistPP.CPState(inst)
    require(byKey.length == inst.size, "distributed FW lost instances")
    var i = 0
    while (i < inst.size) {
      require(java.util.Arrays.equals(byKey(i)._1, inst.members(i)),
              "instance order mismatch after collect")
      System.arraycopy(byKey(i)._2, 0, state.alpha(i), 0, h)
      i += 1
    }
    java.util.Arrays.fill(state.r, 0.0)
    i = 0
    while (i < inst.size) {
      val mem = inst.members(i)
      var j = 0
      while (j < mem.length) { state.r(mem(j)) += state.alpha(i)(j); j += 1 }
      i += 1
    }
    state.t = iters
    state
  }
}
