package repro

import repro.clique.CliqueEnum

class SynthGraphsSpec extends SparkSpec {

  test("gnp is deterministic in its seed") {
    val a = SynthGraphs.gnp(50, 0.1, 42)
    val b = SynthGraphs.gnp(50, 0.1, 42)
    val c = SynthGraphs.gnp(50, 0.1, 43)
    assert(a.edges == b.edges)
    assert(a.edges != c.edges)
  }

  test("gnp edge count is near n(n-1)p/2") {
    val g = SynthGraphs.gnp(200, 0.1, 7)
    val expected = 200 * 199 / 2 * 0.1
    assert(math.abs(g.m - expected) < expected * 0.2)
  }

  test("plantedCommunities blocks are internally dense") {
    val (g, blocks) = SynthGraphs.plantedCommunities(120, 0.01, Seq((12, 0.9), (10, 0.9)), 5)
    assert(blocks.length == 2)
    for (b <- blocks) {
      val internal = (for (i <- b.indices; j <- i + 1 until b.length
                           if g.hasEdge(b(i), b(j))) yield 1).sum
      val possible = b.length * (b.length - 1) / 2
      assert(internal > possible * 0.7, s"block ${b.head} too sparse: $internal/$possible")
    }
  }

  test("plantedCommunities rejects oversized communities") {
    intercept[IllegalArgumentException](
      SynthGraphs.plantedCommunities(10, 0.1, Seq((8, 0.9), (8, 0.9)), 1))
  }

  test("chungLu is deterministic and hits the target average degree roughly") {
    val g1 = SynthGraphs.chungLu(500, 6.0, 2.5, 11)
    val g2 = SynthGraphs.chungLu(500, 6.0, 2.5, 11)
    assert(g1.edges == g2.edges)
    val avgDeg = 2.0 * g1.m / g1.n
    assert(avgDeg > 2.0 && avgDeg < 12.0, s"avgDeg=$avgDeg")
  }

  test("chungLu produces a skewed degree sequence") {
    val g = SynthGraphs.chungLu(800, 5.0, 2.2, 13)
    val degs = (0 until g.n).map(g.degree).sorted.reverse
    assert(degs.head > 4 * (2.0 * g.m / g.n), s"max degree ${degs.head} not skewed")
  }

  test("caveman with no rewiring is a union of cliques") {
    val g = SynthGraphs.caveman(4, 5, 0.0, 3)
    assert(g.components().length == 4)
    assert(CliqueEnum.count(g, 5) == 4)
  }

  test("caveman with rewiring bridges caves") {
    val g = SynthGraphs.caveman(6, 6, 0.2, 9)
    assert(g.components().length < 6)
  }

  test("benchmarkSuite graphs are deterministic and sized as declared") {
    val a = SynthGraphs.benchmarkSuite()
    val b = SynthGraphs.benchmarkSuite()
    assert(a.map(_.graph.m) == b.map(_.graph.m))
    assert(a.map(_.abbr).distinct.length == a.length)
    assert(a.forall(_.graph.m > 0))
  }

  test("withCommunities planted blocks yield dense near-cliques at the top ids") {
    val g = SynthGraphs.withCommunities(400, 3.0, Seq((12, 0.95)), 21)
    val block = (400 - 12 until 400).toArray
    val internal = (for (i <- block.indices; j <- i + 1 until block.length
                         if g.hasEdge(block(i), block(j))) yield 1).sum
    assert(internal > 40) // ~0.95 * 66
  }
}
