package repro

import repro.graph.LocalGraph
import scala.collection.mutable
import scala.util.Random

/** Synthetic graph generators — the dataset substitute for the paper's 15
  * real SNAP / NetworkRepository graphs (container is offline; see
  * DESIGN.md §2). All generators are deterministic in their seed so the
  * Spark pipeline, the local kernels, and the DuckDB oracle all see
  * identical input.
  *
  *  - [[gnp]] — Erdős–Rényi background noise.
  *  - [[plantedCommunities]] — background + disjoint dense near-clique
  *    communities: the structure LhCDS mines, with known ground truth.
  *  - [[chungLu]] — power-law expected-degree graph: preserves the
  *    heavy-tailed clique-count skew of real social networks that drives
  *    the paper's running-time trends.
  *  - [[caveman]] — relaxed caveman: many overlapping near-cliques,
  *    stressing the clique-spans-multiple-subgraphs decomposition path.
  */
object SynthGraphs {

  /** Erdős–Rényi G(n, p). */
  def gnp(n: Int, p: Double, seed: Long): LocalGraph = {
    val rnd = new Random(seed)
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    var u = 0
    while (u < n) {
      var v = u + 1
      while (v < n) {
        if (rnd.nextDouble() < p) es += ((u, v))
        v += 1
      }
      u += 1
    }
    LocalGraph.fromEdges(n, es)
  }

  /** Background G(n, pBg) plus planted communities on disjoint vertex
    * blocks `0..s1-1`, `s1..s1+s2-1`, ... Each community `(size, pIn)` is an
    * internal G(size, pIn). Returns the graph and the planted blocks.
    */
  def plantedCommunities(
      n: Int,
      pBg: Double,
      communities: Seq[(Int, Double)],
      seed: Long,
  ): (LocalGraph, Seq[Array[Int]]) = {
    require(communities.map(_._1).sum <= n, "communities exceed n")
    val rnd = new Random(seed)
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    // background
    var u = 0
    while (u < n) {
      var v = u + 1
      while (v < n) {
        if (rnd.nextDouble() < pBg) es += ((u, v))
        v += 1
      }
      u += 1
    }
    // planted blocks
    var base = 0
    val blocks = mutable.ArrayBuffer.empty[Array[Int]]
    for ((size, pIn) <- communities) {
      val block = (base until base + size).toArray
      for (i <- 0 until size; j <- i + 1 until size)
        if (rnd.nextDouble() < pIn) es += ((block(i), block(j)))
      blocks += block
      base += size
    }
    (LocalGraph.fromEdges(n, es), blocks.toSeq)
  }

  /** Chung–Lu power-law expected-degree graph. Weights w_i ∝ (i+1)^(-1/(γ-1))
    * scaled so the expected average degree is `avgDeg`; edge {i,j} appears
    * with probability min(1, w_i w_j / Σw).
    */
  def chungLu(n: Int, avgDeg: Double, gamma: Double = 2.5, seed: Long = 7): LocalGraph = {
    val rnd = new Random(seed)
    val raw = Array.tabulate(n)(i => math.pow(i + 1.0, -1.0 / (gamma - 1.0)))
    val scale = avgDeg * n / raw.sum
    val w = raw.map(_ * scale)
    val sumW = w.sum
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    // Efficient sampling: for each i, skip-sample over j with bound
    // p_ij <= w_i * w_j / sumW; w_j is non-increasing so use per-i cap.
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        val p = math.min(1.0, w(i) * w(j) / sumW)
        if (p >= 1.0 - 1e-12) { es += ((i, j)); j += 1 }
        else if (p <= 1e-12) { j = n }
        else {
          // geometric skip with the current (upper-bound) probability,
          // then accept with the true probability at the landing index.
          val skip = math.floor(math.log(rnd.nextDouble()) / math.log1p(-p)).toInt
          j += skip
          if (j < n) {
            val pj = math.min(1.0, w(i) * w(j) / sumW)
            if (rnd.nextDouble() < pj / p) es += ((i, j))
            j += 1
          }
        }
      }
      i += 1
    }
    LocalGraph.fromEdges(n, es)
  }

  /** Relaxed caveman: `nCaves` cliques of `size` vertices; each internal
    * edge is rewired to a random outside endpoint with probability
    * `rewireP`, creating overlapping near-cliques and bridges.
    */
  def caveman(nCaves: Int, size: Int, rewireP: Double, seed: Long): LocalGraph = {
    val rnd = new Random(seed)
    val n = nCaves * size
    val es = mutable.LinkedHashSet.empty[(Int, Int)]
    for (c <- 0 until nCaves) {
      val base = c * size
      for (i <- 0 until size; j <- i + 1 until size) {
        var (u, v) = (base + i, base + j)
        if (rnd.nextDouble() < rewireP) {
          v = rnd.nextInt(n)
        }
        if (u != v) es += ((math.min(u, v), math.max(u, v)))
      }
    }
    LocalGraph.fromEdges(n, es)
  }

  /** Named benchmark graphs standing in for the paper's Table-2 datasets.
    * Sizes are laptop-scale; shapes (power-law skew, planted dense regions,
    * caveman overlap) mirror the real datasets' mechanics. Deterministic.
    */
  case class NamedGraph(name: String, abbr: String, graph: LocalGraph)

  /** The planted community densities are chosen well above the power-law
    * background's compact level: a Chung–Lu hub halo forms a legitimately
    * ρ-compact region that, per Definition 2's maximality, absorbs any
    * planted block whose h-clique density falls below it. Keeping blocks
    * strictly denser makes the suite carry ~5 genuine LhCDSes per graph,
    * mirroring the multiple dense communities of the paper's real
    * networks.
    */
  def benchmarkSuite(): Seq[NamedGraph] = Seq(
    NamedGraph("syn-hamsterster", "SYN-HA",
      withCommunities(1200, 6.0, Seq((22, 0.9), (20, 0.85), (18, 0.9), (16, 0.95), (15, 0.95)), 11)),
    NamedGraph("syn-grqc", "SYN-GQ",
      withCommunities(2600, 3.5, Seq((20, 0.95), (18, 0.9), (16, 0.95), (15, 0.9), (14, 1.0)), 13)),
    NamedGraph("syn-politician", "SYN-PP",
      withCommunities(3000, 7.0, Seq((24, 0.85), (22, 0.85), (20, 0.9), (18, 0.9), (16, 0.95)), 17)),
    NamedGraph("syn-company", "SYN-PC",
      withCommunities(7000, 4.0, Seq((20, 0.9), (18, 0.9), (16, 0.95), (15, 0.9), (14, 1.0)), 19)),
    NamedGraph("syn-webbase", "SYN-WB",
      withCommunities(8000, 2.5, Seq((16, 0.95), (15, 0.95), (14, 1.0), (13, 0.95)), 23)),
    NamedGraph("syn-condmat", "SYN-CM",
      withCommunities(11000, 5.0, Seq((22, 0.9), (20, 0.85), (18, 0.9), (16, 0.95), (15, 0.95)), 29)),
    NamedGraph("syn-epinions", "SYN-EP",
      withCommunities(13000, 4.5, Seq((21, 0.9), (19, 0.95), (18, 0.9), (17, 0.95), (16, 1.0)), 31)),
    NamedGraph("syn-enron", "SYN-EN",
      withCommunities(18000, 5.0, Seq((24, 0.9), (22, 0.9), (20, 0.95), (18, 0.95), (16, 1.0)), 37)),
  )

  /** Chung–Lu skeleton plus planted communities overlaid on the lowest-id
    * (highest-weight) region is avoided: blocks are placed at high ids so
    * planting does not collide with the power-law hubs.
    */
  def withCommunities(n: Int, avgDeg: Double, comms: Seq[(Int, Double)], seed: Long): LocalGraph = {
    val bg = chungLu(n, avgDeg, 2.5, seed)
    val rnd = new Random(seed * 31 + 7)
    val es = mutable.ArrayBuffer.empty[(Int, Int)]
    es ++= bg.edges
    var base = n - comms.map(_._1).sum
    for ((size, pIn) <- comms) {
      for (i <- 0 until size; j <- i + 1 until size)
        if (rnd.nextDouble() < pIn) es += ((base + i, base + j))
      // a couple of bridges into the background so communities are not
      // isolated components
      es += ((base, rnd.nextInt(base.max(1))))
      base += size
    }
    LocalGraph.fromEdges(n, es)
  }
}
