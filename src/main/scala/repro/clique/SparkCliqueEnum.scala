package repro.clique

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.InstanceSet
import repro.graph.{LocalGraph, SparkGraph}

/** Distributed h-clique enumeration as iterated DataFrame self-joins
  * (Catalyst plans the shuffles — the distributed-dataflow mapping of
  * clique listing).
  *
  * Edges are oriented along the (degree, id) total order; a k-clique is
  * represented as columns v1..vk ascending in that order. Extending a
  * (k−1)-clique joins its last vertex against oriented edges to propose
  * vk, then (k−2) further joins assert that every earlier vi is also
  * oriented-adjacent to vk. Each h-clique is emitted exactly once.
  */
object SparkCliqueEnum {

  /** DataFrame of all h-cliques with columns v1..vh (orientation order). */
  def cliques(edges: DataFrame, h: Int): DataFrame = {
    require(h >= 2, "use the vertex list directly for h = 1")
    val oriented = SparkGraph.orientByDegree(SparkGraph.canonicalize(edges)).cache()
    var cur = oriented.select(col("a").as("v1"), col("b").as("v2"))
    var k = 2
    while (k < h) {
      val ext = oriented.select(col("a").as(s"v$k"), col("b").as(s"v${k + 1}"))
      var next = cur.join(ext, s"v$k")
      for (i <- 1 until k) {
        val chk = oriented.select(col("a").as(s"v$i"), col("b").as(s"v${k + 1}"))
        next = next.join(chk, Seq(s"v$i", s"v${k + 1}"), "leftsemi")
      }
      cur = next.select((1 to k + 1).map(i => col(s"v$i")): _*)
      k += 1
    }
    cur
  }

  /** |Ψ_h| without materializing members on the driver. */
  def count(edges: DataFrame, h: Int): Long = cliques(edges, h).count()

  /** Collect the distributed enumeration into an [[InstanceSet]] over
    * `0 until n` (members re-sorted by vertex id).
    */
  def collectInstances(edges: DataFrame, h: Int, n: Int): InstanceSet = {
    val rows = cliques(edges, h).collect()
    val members = rows.map(r => Array.tabulate(h)(i => r.getInt(r.fieldIndex(s"v${i + 1}"))))
    InstanceSet(n, h, members)
  }

  /** Convenience: enumerate on a LocalGraph through the Spark pipeline. */
  def fromLocal(spark: SparkSession, g: LocalGraph, h: Int): InstanceSet =
    collectInstances(SparkGraph.fromLocal(spark, g), h, g.n)
}
