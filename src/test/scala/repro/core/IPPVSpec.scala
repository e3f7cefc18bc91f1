package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.clique.CliqueEnum
import repro.graph.LocalGraph

class IPPVSpec extends SparkSpec {

  private def check(g: LocalGraph, h: Int, cfg: IPPV.Config = IPPV.Config(), tag: String = ""): Unit = {
    val inst = CliqueEnum.enumerate(g, h)
    val truth = BruteForce.allLhCDS(g, inst)
    val got = IPPV.topK(g, inst, g.n + 1, cfg)
    assert(got.map(_.vertices.toSeq) == truth.map(_._1.toSeq),
      s"$tag h=$h got=${got.map(_.vertices.toSeq)} want=${truth.map(_._1.toSeq)}")
    for ((l, (_, num, den)) <- got.zip(truth))
      assert(l.num == num && l.den == den, s"$tag density mismatch")
  }

  test("two path-bridged cliques, h=3: the two cliques, densest first") {
    val g = TestGraphs.twoCliquesPathBridged(6, 4) // K6, path vertex 6, K4 on 7..10
    val inst = CliqueEnum.enumerate(g, 3)
    val res = IPPV.topK(g, inst, 5)
    assert(res.map(_.vertices.toSeq) == Seq((0 until 6).toSeq, (7 until 11).toSeq))
    assert(res.head.num == 20 && res.head.den == 6) // C(6,3)=20 triangles
    assert(res(1).num == 4 && res(1).den == 4)
  }

  test("a directly bridged smaller clique is absorbed, not reported") {
    val g = TestGraphs.twoCliquesBridged(6, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val res = IPPV.topK(g, inst, 5)
    assert(res.map(_.vertices.toSeq) == BruteForce.allLhCDS(g, inst).map(_._1.toSeq))
  }

  test("top-k truncation returns exactly k results in density order") {
    val g = TestGraphs.twoCliquesPathBridged(6, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val res = IPPV.topK(g, inst, 1)
    assert(res.length == 1 && res.head.vertices.toSeq == (0 until 6))
  }

  test("k larger than the number of LhCDSes returns all (Enron-note behavior)") {
    val g = TestGraphs.twoCliquesPathBridged(5, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    assert(IPPV.topK(g, inst, 100).length ==
      BruteForce.allLhCDS(g, inst).length)
  }

  test("instance-free graph yields nothing") {
    val g = TestGraphs.petersen() // triangle-free
    val inst = CliqueEnum.enumerate(g, 3)
    assert(IPPV.topK(g, inst, 3).isEmpty)
  }

  for (seed <- 1 to 12) {
    test(s"exactness vs brute force, h=3, random graph seed=$seed") {
      check(TestGraphs.random(9, 0.5, seed + 1000), 3, tag = s"seed=$seed")
    }
  }

  for (seed <- 1 to 8) {
    test(s"exactness vs brute force, h=2 (LDS), random graph seed=$seed") {
      check(TestGraphs.random(8, 0.45, seed + 1100), 2, tag = s"seed=$seed")
    }
  }

  for (seed <- 1 to 8) {
    test(s"exactness vs brute force, h=4, random graph seed=$seed") {
      check(TestGraphs.random(9, 0.55, seed + 1200), 4, tag = s"seed=$seed")
    }
  }

  for (seed <- 1 to 6) {
    test(s"basic verification config agrees with fast (seed=$seed)") {
      check(TestGraphs.random(9, 0.5, seed + 1300), 3,
        IPPV.Config(fastVerify = false), tag = s"seed=$seed")
    }
  }

  for (seed <- 1 to 6) {
    test(s"flow-only refinement (useCP=false) stays exact (seed=$seed)") {
      check(TestGraphs.random(9, 0.5, seed + 1400), 3,
        IPPV.Config(useCP = false, fastVerify = false), tag = s"seed=$seed")
    }
  }

  test("few Frank-Wolfe iterations still exact (verification carries correctness)") {
    for (seed <- 1 to 5)
      check(TestGraphs.random(9, 0.5, seed + 1500), 3,
        IPPV.Config(fwIters = 2, maxRefineRounds = 1), tag = s"seed=$seed")
  }

  test("outputs are pairwise disjoint and non-adjacent, densities descending") {
    val (g, _) = SynthGraphs2.planted()
    val inst = CliqueEnum.enumerate(g, 3)
    val res = IPPV.topK(g, inst, 10)
    val all = res.flatMap(_.vertices)
    assert(all.distinct.length == all.length)
    for (i <- 0 until res.length - 1)
      assert(res(i).density >= res(i + 1).density - 1e-12)
    // no edge between two different outputs (Proposition 4 corollary)
    for (i <- res.indices; j <- res.indices if i != j;
         u <- res(i).vertices; v <- res(j).vertices)
      assert(!g.hasEdge(u, v), s"outputs $i and $j adjacent")
  }

  test("planted communities are recovered as the top LhCDSes") {
    val (g, blocks) = SynthGraphs2.planted()
    val inst = CliqueEnum.enumerate(g, 3)
    val res = IPPV.topK(g, inst, 2)
    assert(res.length == 2)
    val found = res.map(_.vertices.toSet)
    // each planted block should be essentially recovered (allowing the
    // densest core of the block to shed a couple of sparse members)
    for (b <- blocks.take(2)) {
      val bs = b.toSet
      assert(found.exists(f => (f intersect bs).size >= bs.size - 2 && (f -- bs).isEmpty),
        s"block ${b.toSeq} not recovered among ${found.map(_.toSeq.sorted)}")
    }
  }

  test("stats are populated") {
    val g = TestGraphs.twoCliquesPathBridged(6, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val (res, stats) = IPPV.topKWithStats(g, inst, 5)
    assert(res.length == 2)
    assert(stats.isDensestCalls > 0 && stats.verifyCalls > 0 && stats.proposeRounds > 0)
  }

  test("every verified output is independently a brute-force LhCDS on a planted graph") {
    val (g, _) = SynthGraphs2.smallPlanted()
    val inst = CliqueEnum.enumerate(g, 3)
    val truth = BruteForce.allLhCDS(g, inst).map(_._1.toSeq)
    val res = IPPV.topK(g, inst, 20)
    assert(res.map(_.vertices.toSeq) == truth)
  }

  private object SynthGraphs2 {
    def planted(): (LocalGraph, Seq[Array[Int]]) =
      repro.SynthGraphs.plantedCommunities(60, 0.03, Seq((10, 1.0), (8, 1.0)), 99)
    def smallPlanted(): (LocalGraph, Seq[Array[Int]]) =
      repro.SynthGraphs.plantedCommunities(12, 0.1, Seq((5, 1.0), (4, 1.0)), 31)
  }
}
