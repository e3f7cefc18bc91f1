package repro.pattern

import repro.{SparkSpec, TestGraphs}
import repro.graph.LocalGraph
import PatternEnum._

class PatternEnumSpec extends SparkSpec {

  /** Brute-force connected 4-subsets. */
  private def brute4(g: LocalGraph): Set[Seq[Int]] =
    (for {
      a <- 0 until g.n; b <- a + 1 until g.n
      c <- b + 1 until g.n; d <- c + 1 until g.n
      vs = Array(a, b, c, d)
      if g.isConnected(vs)
    } yield vs.toSeq).toSet

  for (seed <- 1 to 8) {
    test(s"ESU enumerates each connected 4-subset exactly once (seed=$seed)") {
      val g = TestGraphs.random(10, 0.35, seed + 3000)
      val got = connectedSubsets(g, 4).map(_.toSeq)
      assert(got.distinct.length == got.length, "duplicates")
      assert(got.toSet == brute4(g), s"seed=$seed")
    }
  }

  test("ESU sizes 1..3 on a path") {
    val g = LocalGraph.path(5)
    assert(connectedSubsets(g, 1).length == 5)
    assert(connectedSubsets(g, 2).length == 4)
    assert(connectedSubsets(g, 3).length == 3)
  }

  test("classification: K4 is a clique, C4 a cycle, star and path") {
    assert(classify4(LocalGraph.complete(4), Array(0, 1, 2, 3)) == Clique4)
    assert(classify4(LocalGraph.cycle(4), Array(0, 1, 2, 3)) == Cycle4)
    assert(classify4(LocalGraph.star(4), Array(0, 1, 2, 3)) == Star4)
    assert(classify4(LocalGraph.path(4), Array(0, 1, 2, 3)) == Path4)
    assert(classify4(TestGraphs.diamond(), Array(0, 1, 2, 3)) == Diamond4)
    val paw = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (0, 2), (2, 3)))
    assert(classify4(paw, Array(0, 1, 2, 3)) == TailedTriangle4)
  }

  test("counts on elementary graphs") {
    assert(counts4(LocalGraph.complete(4))(Clique4) == 1)
    assert(counts4(LocalGraph.complete(5))(Clique4) == 5)   // C(5,4)
    assert(counts4(LocalGraph.complete(5))(Diamond4) == 0)  // induced only
    assert(counts4(LocalGraph.cycle(6))(Path4) == 6)
    assert(counts4(LocalGraph.cycle(4))(Cycle4) == 1)
    assert(counts4(LocalGraph.star(7))(Star4) == 20)        // C(6,3)
    assert(counts4(LocalGraph.path(6))(Path4) == 3)
  }

  test("pattern counts partition the connected 4-subsets") {
    for (seed <- 1 to 4) {
      val g = TestGraphs.random(11, 0.4, seed + 3100)
      val total = connectedSubsets(g, 4).length.toLong
      assert(counts4(g).values.sum == total, s"seed=$seed")
    }
  }

  test("induced K4 instances equal non-induced 4-clique instances") {
    for (seed <- 1 to 4) {
      val g = TestGraphs.random(11, 0.5, seed + 3200)
      val viaPattern = instances4(g, Clique4).members.map(_.toSeq).toSet
      val viaClique = repro.clique.CliqueEnum.enumerate(g, 4).members.map(_.toSeq).toSet
      assert(viaPattern == viaClique, s"seed=$seed")
    }
  }

  test("brute-force classification agrees per pattern") {
    val g = TestGraphs.random(9, 0.45, 3333)
    val byEnum = all4.map(p => p -> instances4(g, p).members.map(_.toSeq).toSet).toMap
    val byBrute = brute4(g).groupBy(vs => classify4(g, vs.toArray))
    for (p <- all4)
      assert(byEnum(p) == byBrute.getOrElse(p, Set.empty), p.name)
  }
}
