package repro.graph

import repro.{SparkSpec, TestGraphs}

class GraphMeasuresSpec extends SparkSpec {

  test("edge density of a clique is 1") {
    val g = LocalGraph.complete(6)
    assert(GraphMeasures.edgeDensity(g, (0 until 6).toArray) == 1.0)
  }

  test("edge density of an induced subset counts internal edges only") {
    val g = TestGraphs.twoCliquesBridged(4, 4)
    // subset = first clique: density 1
    assert(GraphMeasures.edgeDensity(g, Array(0, 1, 2, 3)) == 1.0)
    // subset straddling the bridge: 2 vertices, 0 internal edges except bridge 0-4
    assert(GraphMeasures.edgeDensity(g, Array(0, 4)) == 1.0)
    assert(GraphMeasures.edgeDensity(g, Array(1, 5)) == 0.0)
  }

  test("edge density convention for singletons") {
    val g = LocalGraph.path(3)
    assert(GraphMeasures.edgeDensity(g, Array(0)) == 1.0)
  }

  test("diameter of a path is its length") {
    val g = LocalGraph.path(6)
    assert(GraphMeasures.diameter(g, (0 until 6).toArray) == 5)
  }

  test("diameter of a clique is 1, of a 5-cycle is 2") {
    assert(GraphMeasures.diameter(LocalGraph.complete(5), (0 until 5).toArray) == 1)
    assert(GraphMeasures.diameter(LocalGraph.cycle(5), (0 until 5).toArray) == 2)
  }

  test("diameter of the Petersen graph is 2") {
    assert(GraphMeasures.diameter(TestGraphs.petersen(), (0 until 10).toArray) == 2)
  }

  test("clustering coefficient of a clique is 1, of a star is 0") {
    val k = LocalGraph.complete(5)
    assert(GraphMeasures.avgClusteringCoefficient(k, (0 until 5).toArray) == 1.0)
    val s = LocalGraph.star(5)
    assert(GraphMeasures.avgClusteringCoefficient(s, (0 until 5).toArray) == 0.0)
  }

  test("clustering coefficient of the diamond") {
    val g = TestGraphs.diamond()
    // degree-2 vertices (0,3): their two neighbors (1,2) are adjacent -> 1.0
    assert(GraphMeasures.clusteringCoefficient(g, 0) == 1.0)
    assert(GraphMeasures.clusteringCoefficient(g, 3) == 1.0)
    // degree-3 vertices (1,2): neighbors {0,2,3} / {0,1,3}; 2 of 3 pairs closed
    assert(math.abs(GraphMeasures.clusteringCoefficient(g, 1) - 2.0 / 3) < 1e-12)
    val avg = GraphMeasures.avgClusteringCoefficient(g, (0 until 4).toArray)
    assert(math.abs(avg - (1.0 + 1.0 + 2.0 / 3 + 2.0 / 3) / 4) < 1e-12)
  }

  test("clustering coefficient is computed within the induced subgraph") {
    val g = TestGraphs.twoCliquesBridged(4, 4)
    // within the first clique the bridge endpoint still has coefficient 1
    assert(GraphMeasures.avgClusteringCoefficient(g, Array(0, 1, 2, 3)) == 1.0)
  }
}
