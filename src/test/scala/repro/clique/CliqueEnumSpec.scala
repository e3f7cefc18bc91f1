package repro.clique

import repro.{SparkSpec, TestGraphs}
import repro.graph.LocalGraph

class CliqueEnumSpec extends SparkSpec {

  private def asSets(inst: repro.core.InstanceSet): Set[Seq[Int]] =
    inst.members.map(_.toSeq).toSet

  test("h=2 enumeration lists the edges") {
    val g = TestGraphs.diamond()
    assert(asSets(CliqueEnum.enumerate(g, 2)) ==
      Set(Seq(0, 1), Seq(0, 2), Seq(1, 2), Seq(1, 3), Seq(2, 3)))
  }

  test("triangles of the diamond") {
    val g = TestGraphs.diamond()
    assert(asSets(CliqueEnum.enumerate(g, 3)) == Set(Seq(0, 1, 2), Seq(1, 2, 3)))
  }

  test("K_n contains binomial(n, h) h-cliques") {
    val g = LocalGraph.complete(7)
    def binom(n: Int, k: Int): Long =
      (1 to k).foldLeft(1L)((acc, i) => acc * (n - i + 1) / i)
    for (h <- 2 to 7)
      assert(CliqueEnum.count(g, h) == binom(7, h), s"h=$h")
  }

  test("Petersen graph is triangle-free") {
    assert(CliqueEnum.count(TestGraphs.petersen(), 3) == 0)
    assert(CliqueEnum.enumerate(TestGraphs.petersen(), 3).size == 0)
  }

  test("cycle graph has n edges and no triangles") {
    val g = LocalGraph.cycle(8)
    assert(CliqueEnum.count(g, 2) == 8)
    assert(CliqueEnum.count(g, 3) == 0)
  }

  test("h=1 enumerates the vertices") {
    val g = LocalGraph.path(4)
    assert(CliqueEnum.enumerate(g, 1).size == 4)
    assert(CliqueEnum.count(g, 1) == 4)
  }

  test("instances are sorted, distinct, and have sorted members") {
    val g = TestGraphs.random(14, 0.45, 2)
    val inst = CliqueEnum.enumerate(g, 4)
    assert(inst.members.forall(m => m.sorted.sameElements(m)))
    assert(inst.members.map(_.toSeq).distinct.length == inst.size)
  }

  for (seed <- 1 to 8; h <- 3 to 5) {
    test(s"kClist enumeration equals brute force (n=13, seed=$seed, h=$h)") {
      val g = TestGraphs.random(13, 0.45, seed)
      assert(asSets(CliqueEnum.enumerate(g, h)) == asSets(CliqueEnum.bruteForce(g, h)))
    }
  }

  for (seed <- 1 to 5; h <- 2 to 6) {
    test(s"count agrees with enumerate (n=16, seed=$seed, h=$h)") {
      val g = TestGraphs.random(16, 0.4, seed + 100)
      assert(CliqueEnum.count(g, h) == CliqueEnum.enumerate(g, h).size.toLong)
    }
  }

  test("clique degrees: every vertex of K5 is in binomial(4,2) triangles") {
    val inst = CliqueEnum.enumerate(LocalGraph.complete(5), 3)
    assert(inst.degrees.toSeq == Seq.fill(5)(6))
  }

  test("two bridged cliques: counts add up, bridge creates no new triangle") {
    val g = TestGraphs.twoCliquesBridged(5, 4)
    assert(CliqueEnum.count(g, 3) == 10 + 4) // C(5,3) + C(4,3)
    assert(CliqueEnum.count(g, 4) == 5 + 1)
    assert(CliqueEnum.count(g, 5) == 1)
  }
}
