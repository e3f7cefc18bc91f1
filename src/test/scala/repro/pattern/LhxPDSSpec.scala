package repro.pattern

import repro.{SparkSpec, TestGraphs}
import repro.core.{BruteForce, IPPV}
import repro.graph.LocalGraph
import PatternEnum._

/** Locally hx-pattern densest subgraph discovery (Section 5): the IPPV
  * pipeline running unchanged on pattern instance sets, checked against
  * the brute-force Definition-7 ground truth.
  */
class LhxPDSSpec extends SparkSpec {

  private def check(g: LocalGraph, p: Pattern4, tag: String): Unit = {
    val inst = instances4(g, p)
    val truth = BruteForce.allLhCDS(g, inst)
    val got = IPPV.topK(g, inst, g.n + 1)
    assert(got.map(_.vertices.toSeq) == truth.map(_._1.toSeq),
      s"$tag ${p.name}: got=${got.map(_.vertices.toSeq)} want=${truth.map(_._1.toSeq)}")
  }

  for (seed <- 1 to 4; p <- all4) {
    test(s"L4xPDS exactness: pattern ${p.code} (${p.name}), seed=$seed") {
      check(TestGraphs.random(9, 0.45, seed + 4000), p, s"seed=$seed")
    }
  }

  test("clique-pattern LhxPDS equals h=4 LhCDS") {
    val g = TestGraphs.random(10, 0.5, 4500)
    val viaPattern = IPPV.topK(g, instances4(g, Clique4), 10)
    val viaClique = IPPV.topK(g, repro.clique.CliqueEnum.enumerate(g, 4), 10)
    assert(viaPattern.map(_.vertices.toSeq) == viaClique.map(_.vertices.toSeq))
  }

  test("cycle-pattern LhxPDS on a cycle-rich fixture") {
    // two disjoint K3,3-ish grids of 4-cycles vs sparse background
    val es = Seq((0, 1), (1, 2), (2, 3), (3, 0), (0, 2), // dense cycle cluster
                 (4, 5), (5, 6), (6, 7), (7, 4),          // plain C4
                 (3, 4))                                   // bridge
    val g = LocalGraph.fromEdges(8, es)
    val inst = instances4(g, Cycle4)
    val got = IPPV.topK(g, inst, 5)
    val truth = BruteForce.allLhCDS(g, inst)
    assert(got.map(_.vertices.toSeq) == truth.map(_._1.toSeq))
  }

  test("different patterns find different dense regions (Fig 17 shape)") {
    // star-heavy region (a hub) vs clique region
    val hub = (1 to 6).map(i => (0, i))
    val clique = for (i <- 7 until 12; j <- i + 1 until 12) yield (i, j)
    val g = LocalGraph.fromEdges(12, hub ++ clique :+ (6, 7))
    val starTop = IPPV.topK(g, instances4(g, Star4), 1)
    val cliqueTop = IPPV.topK(g, instances4(g, Clique4), 1)
    assert(starTop.nonEmpty && cliqueTop.nonEmpty)
    assert(starTop.head.vertices.contains(0))        // the hub
    assert(cliqueTop.head.vertices.toSeq == (7 until 12)) // the K5
  }
}
