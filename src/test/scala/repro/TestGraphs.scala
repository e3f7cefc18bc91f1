package repro

import repro.graph.LocalGraph
import scala.util.Random

/** Deterministic random graphs and fixtures shared by the test suites. */
object TestGraphs {

  /** G(n, p) with an explicit seed (test-local; independent of SynthGraphs
    * so generator bugs cannot mask algorithm bugs).
    */
  def random(n: Int, p: Double, seed: Long): LocalGraph = {
    val rnd = new Random(seed)
    val es = for {
      u <- 0 until n
      v <- u + 1 until n
      if rnd.nextDouble() < p
    } yield (u, v)
    LocalGraph.fromEdges(n, es)
  }

  /** Two disjoint cliques of sizes a and b joined by a single bridge edge
    * (0 — a): a canonical two-LhCDS fixture when a, b >= h.
    */
  def twoCliquesBridged(a: Int, b: Int): LocalGraph = {
    val es = (for (i <- 0 until a; j <- i + 1 until a) yield (i, j)) ++
      (for (i <- 0 until b; j <- i + 1 until b) yield (a + i, a + j)) ++
      Seq((0, a))
    LocalGraph.fromEdges(a + b, es)
  }

  /** Two cliques K_a (0..a-1) and K_b (a+1..a+b) joined through a middle
    * path vertex `a` that lies in no triangle. For h >= 3 both cliques are
    * genuine LhCDSes: any connected superset of either must include the
    * triangle-free cut vertex, whose removal kills no h-clique, breaking
    * compactness (unlike a direct bridge edge, under which the union stays
    * ρ-compact and absorbs the smaller clique).
    */
  def twoCliquesPathBridged(a: Int, b: Int): LocalGraph = {
    val es = (for (i <- 0 until a; j <- i + 1 until a) yield (i, j)) ++
      (for (i <- 0 until b; j <- i + 1 until b) yield (a + 1 + i, a + 1 + j)) ++
      Seq((0, a), (a, a + 1))
    LocalGraph.fromEdges(a + b + 1, es)
  }

  /** The K4-minus-an-edge "diamond". */
  def diamond(): LocalGraph =
    LocalGraph.fromEdges(4, Seq((0, 1), (0, 2), (1, 2), (1, 3), (2, 3)))

  /** Petersen graph: 3-regular, girth 5, zero triangles. */
  def petersen(): LocalGraph = {
    val outer = (0 until 5).map(i => (i, (i + 1) % 5))
    val spokes = (0 until 5).map(i => (i, i + 5))
    val inner = (0 until 5).map(i => (5 + i, 5 + (i + 2) % 5))
    LocalGraph.fromEdges(10, outer ++ spokes ++ inner)
  }
}
