package repro.graph

import scala.collection.mutable

/** Quality measures reported in the paper's evaluation tables.
  *
  * Table 4 uses average edge density `2|E| / (|V|(|V|-1))` and the diameter
  * of each detected subgraph; Table 5 uses the average clustering
  * coefficient. All measures here are computed on the subgraph *induced* by
  * the detected vertex set, matching the paper's usage.
  */
object GraphMeasures {

  /** Edge density 2m / (n(n-1)) of the induced subgraph (1.0 for n <= 1). */
  def edgeDensity(g: LocalGraph, vs: Array[Int]): Double = {
    val k = vs.length
    if (k <= 1) return 1.0
    val (sub, _) = g.inducedOn(vs)
    2.0 * sub.m / (k.toDouble * (k - 1))
  }

  /** Diameter (longest shortest path) of the induced subgraph via BFS from
    * every vertex. Requires the induced subgraph to be connected.
    */
  def diameter(g: LocalGraph, vs: Array[Int]): Int = {
    val (sub, _) = g.inducedOn(vs)
    var best = 0
    val dist = new Array[Int](sub.n)
    val queue = new mutable.ArrayDeque[Int]()
    var s = 0
    while (s < sub.n) {
      java.util.Arrays.fill(dist, -1)
      dist(s) = 0; queue.append(s)
      while (queue.nonEmpty) {
        val v = queue.removeHead()
        if (dist(v) > best) best = dist(v)
        sub.foreachNeighbor(v) { w =>
          if (dist(w) < 0) { dist(w) = dist(v) + 1; queue.append(w) }
        }
      }
      s += 1
    }
    best
  }

  /** Clustering coefficient of one vertex within the induced subgraph:
    * fraction of neighbor pairs that are themselves adjacent (0 if < 2
    * neighbors, matching the usual convention).
    */
  def clusteringCoefficient(g: LocalGraph, v: Int): Double = {
    val nb = g.neighbors(v)
    val k = nb.length
    if (k < 2) return 0.0
    var closed = 0
    var i = 0
    while (i < k) {
      var j = i + 1
      while (j < k) {
        if (g.hasEdge(nb(i), nb(j))) closed += 1
        j += 1
      }
      i += 1
    }
    2.0 * closed / (k.toDouble * (k - 1))
  }

  /** Average clustering coefficient over the vertices of the induced
    * subgraph (coefficients computed within the subgraph).
    */
  def avgClusteringCoefficient(g: LocalGraph, vs: Array[Int]): Double = {
    if (vs.isEmpty) return 0.0
    val (sub, _) = g.inducedOn(vs)
    (0 until sub.n).map(clusteringCoefficient(sub, _)).sum / sub.n
  }
}
