package repro.clique

import repro.{SparkSpec, TestGraphs}
import repro.graph.LocalGraph

class CliqueCoreSpec extends SparkSpec {

  test("edge cores (h=2) of a clique are n-1") {
    val inst = CliqueEnum.enumerate(LocalGraph.complete(5), 2)
    assert(CliqueCore.coreNumbers(inst).toSeq == Seq.fill(5)(4))
  }

  test("triangle cores of K5 are C(4,2)") {
    val inst = CliqueEnum.enumerate(LocalGraph.complete(5), 3)
    assert(CliqueCore.coreNumbers(inst).toSeq == Seq.fill(5)(6))
  }

  test("vertices in no instance get core 0") {
    val g = LocalGraph.fromEdges(5, Seq((0, 1), (1, 2), (0, 2)))
    val inst = CliqueEnum.enumerate(g, 3)
    val core = CliqueCore.coreNumbers(inst)
    assert(core(3) == 0 && core(4) == 0)
    assert(core(0) == 1 && core(1) == 1 && core(2) == 1)
  }

  test("bridged cliques keep their separate clique-core levels") {
    val g = TestGraphs.twoCliquesBridged(6, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val core = CliqueCore.coreNumbers(inst)
    // K6 members: triangle degree C(5,2)=10; K4 members: C(3,2)=3
    assert((0 until 6).forall(core(_) == 10))
    assert((6 until 10).forall(core(_) == 3))
  }

  for (seed <- 1 to 8; h <- 2 to 4) {
    test(s"core numbers match brute-force peeling (n=12, seed=$seed, h=$h)") {
      val g = TestGraphs.random(12, 0.45, seed + 10)
      val inst = CliqueEnum.enumerate(g, h)
      assert(CliqueCore.coreNumbers(inst).toSeq == CliqueCore.bruteForce(inst).toSeq)
    }
  }

  test("core numbers on pattern instances (star occurrences)") {
    val g = LocalGraph.star(6)
    val inst = repro.pattern.PatternEnum.instances4(g, repro.pattern.PatternEnum.Star4)
    val core = CliqueCore.coreNumbers(inst)
    assert(inst.size == 10) // C(5,3) induced stars
    assert(core(0) == inst.degrees.min || core(0) >= core(1)) // hub at least leaf level
    assert(CliqueCore.coreNumbers(inst).toSeq == CliqueCore.bruteForce(inst).toSeq)
  }

  test("core upper-bounds the instance compact number (Proposition 3 shape)") {
    // every vertex's instance degree within any subgraph <= its core number
    val g = TestGraphs.random(11, 0.5, 77)
    val inst = CliqueEnum.enumerate(g, 3)
    val core = CliqueCore.coreNumbers(inst)
    val phi = repro.core.BruteForce.compactNumbers(g, inst)
    for (v <- 0 until g.n)
      assert(phi(v)._1.toDouble / phi(v)._2 <= core(v) + 1e-9, s"v=$v")
  }
}
