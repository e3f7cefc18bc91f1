package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.clique.CliqueEnum
import repro.graph.LocalGraph

class BruteForceSpec extends SparkSpec {

  test("compactness of a clique equals its density (Prop 1 tight)") {
    val g = LocalGraph.complete(5)
    val inst = CliqueEnum.enumerate(g, 3)
    val cnt = BruteForce.subsetInstanceCounts(5, inst)
    val (num, den) = BruteForce.compactness(cnt, (1 << 5) - 1)
    assert(num * 5 == 10 * den) // 10 triangles / 5 vertices = 2
  }

  test("compactness detects a weakly attached vertex") {
    // triangle 0-1-2 plus pendant 3 attached to 0: removing 3 removes no
    // triangle, so compactness is 0
    val g = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (0, 2), (0, 3)))
    val inst = CliqueEnum.enumerate(g, 3)
    val cnt = BruteForce.subsetInstanceCounts(4, inst)
    val (num, _) = BruteForce.compactness(cnt, 0xF)
    assert(num == 0)
  }

  test("compact numbers on the paper's Figure-2 shape (two cliques bridged)") {
    val g = TestGraphs.twoCliquesBridged(5, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val phi = BruteForce.compactNumbers(g, inst)
    // K5 members: φ = C(5,3)/5 = 2 ; K4 members: φ = C(4,3)/4 = 1
    for (v <- 0 until 5) assert(BruteForce.ratEq(phi(v)._1, phi(v)._2, 2, 1), s"v=$v ${phi(v)}")
    for (v <- 5 until 9) assert(BruteForce.ratEq(phi(v)._1, phi(v)._2, 1, 1), s"v=$v ${phi(v)}")
  }

  test("allLhCDS of two path-bridged cliques is exactly the two cliques") {
    // K5 (0..4) — path vertex 5 — K4 (6..9); the triangle-free cut vertex
    // makes every superset of either clique non-compact.
    val g = TestGraphs.twoCliquesPathBridged(5, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val all = BruteForce.allLhCDS(g, inst)
    assert(all.map(_._1.toSeq) == Seq((0 until 5).toSeq, (6 until 10).toSeq))
    assert(all.head._2 == 10 && all.head._3 == 5)
    assert(all(1)._2 == 4 && all(1)._3 == 4)
  }

  test("a direct bridge edge absorbs the smaller clique (union stays compact)") {
    // With a direct bridge, the whole graph is 1-compact and strictly
    // contains the K4, so only the K5 is an LhCDS — the subtle part of
    // Definition 2's maximality condition.
    val g = TestGraphs.twoCliquesBridged(5, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val all = BruteForce.allLhCDS(g, inst)
    assert(all.map(_._1.toSeq) == Seq((0 until 5).toSeq))
  }

  test("LhCDSes are pairwise disjoint (Proposition 2)") {
    for (seed <- 1 to 6) {
      val g = TestGraphs.random(9, 0.5, seed + 20)
      val inst = CliqueEnum.enumerate(g, 3)
      val all = BruteForce.allLhCDS(g, inst)
      val flat = all.flatMap(_._1)
      assert(flat.distinct.length == flat.length, s"seed=$seed")
    }
  }

  test("every LhCDS member's compact number equals the LhCDS density (Theorem 1)") {
    for (seed <- 1 to 6) {
      val g = TestGraphs.random(9, 0.5, seed + 30)
      val inst = CliqueEnum.enumerate(g, 3)
      val all = BruteForce.allLhCDS(g, inst)
      val phi = BruteForce.compactNumbers(g, inst)
      for ((vs, num, den) <- all; v <- vs)
        assert(BruteForce.ratEq(phi(v)._1, phi(v)._2, num, den), s"seed=$seed v=$v")
    }
  }

  test("h=2 LhCDS on a pair of linked triangles merges them (7/6-compact union)") {
    val g = LocalGraph.fromEdges(7, Seq((0, 1), (1, 2), (0, 2), (3, 4), (4, 5), (3, 5), (2, 3), (5, 6)))
    val inst = CliqueEnum.enumerate(g, 2)
    val all = BruteForce.allLhCDS(g, inst)
    // the two triangles plus the linking edge form a 7/6-compact maximal
    // region; the pendant vertex 6 stays out
    assert(all.map(_._1.toSeq) == Seq(Seq(0, 1, 2, 3, 4, 5)))
    assert(all.head._2 == 7 && all.head._3 == 6)
  }

  test("compact numbers equal φ on the path-bridged fixture") {
    val g = TestGraphs.twoCliquesPathBridged(5, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val phi = BruteForce.compactNumbers(g, inst)
    for (v <- 0 until 5) assert(BruteForce.ratEq(phi(v)._1, phi(v)._2, 2, 1), s"v=$v")
    assert(phi(5)._1 == 0) // the path vertex is in no triangle
    for (v <- 6 until 10) assert(BruteForce.ratEq(phi(v)._1, phi(v)._2, 1, 1), s"v=$v")
  }

  test("connectedMask") {
    val g = LocalGraph.path(4)
    assert(BruteForce.connectedMask(g, 0x3))  // {0,1}
    assert(!BruteForce.connectedMask(g, 0x5)) // {0,2}
    assert(BruteForce.connectedMask(g, 0xF))
    assert(!BruteForce.connectedMask(g, 0))
  }
}
