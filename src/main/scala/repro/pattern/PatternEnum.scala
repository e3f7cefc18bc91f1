package repro.pattern

import repro.core.InstanceSet
import repro.graph.LocalGraph
import scala.collection.mutable

/** General h-vertex pattern (motif) enumeration for the LhxPDS extension
  * (Section 5). Occurrences are *induced* connected subgraphs, enumerated
  * with the ESU algorithm (Wernicke's FANMOD enumerator) which emits every
  * connected k-vertex subset exactly once, then classified by induced edge
  * count and degree sequence.
  *
  * The six connected 4-vertex patterns of Figure 8 are mapped in the
  * conventional order: 4a = path, 4b = star, 4c = cycle, 4d = tailed
  * triangle (paw), 4e = diamond, 4f = 4-clique. Each pattern's occurrence
  * list is an [[InstanceSet]], so the entire IPPV pipeline (cores, convex
  * program, decomposition, pruning, flow verification) runs on patterns
  * unchanged — the "concise and clear" extension the paper claims.
  */
object PatternEnum {

  sealed abstract class Pattern4(val code: String, val name: String, val edges: Int)
  case object Path4 extends Pattern4("4a", "path", 3)
  case object Star4 extends Pattern4("4b", "star", 3)
  case object Cycle4 extends Pattern4("4c", "cycle", 4)
  case object TailedTriangle4 extends Pattern4("4d", "tailed-triangle", 4)
  case object Diamond4 extends Pattern4("4e", "diamond", 5)
  case object Clique4 extends Pattern4("4f", "clique", 6)

  val all4: Seq[Pattern4] = Seq(Path4, Star4, Cycle4, TailedTriangle4, Diamond4, Clique4)

  /** Every connected k-vertex subset of g, exactly once (ESU). */
  def connectedSubsets(g: LocalGraph, k: Int): Array[Array[Int]] = {
    require(k >= 1)
    val out = mutable.ArrayBuffer.empty[Array[Int]]
    val inSub = new Array[Boolean](g.n)
    val nbSub = new Array[Boolean](g.n) // closed neighborhood of the subgraph
    val sub = new Array[Int](k)

    def extend(depth: Int, ext: List[Int], v: Int): Unit = {
      if (depth == k) { out += java.util.Arrays.copyOf(sub, k).sorted; return }
      var rest = ext
      while (rest.nonEmpty) {
        val w = rest.head
        rest = rest.tail
        // exclusive new extension: neighbors of w, > v, not already in the
        // subgraph's closed neighborhood
        val fresh = mutable.ListBuffer.empty[Int]
        g.foreachNeighbor(w) { u =>
          if (u > v && !nbSub(u) && !inSub(u)) fresh += u
        }
        sub(depth) = w
        inSub(w) = true
        val added = fresh.toList
        added.foreach(nbSub(_) = true)
        extend(depth + 1, rest ++ added, v)
        added.foreach(nbSub(_) = false)
        inSub(w) = false
      }
    }

    var v = 0
    while (v < g.n) {
      if (k == 1) out += Array(v)
      else {
        sub(0) = v
        inSub(v) = true
        val ext = mutable.ListBuffer.empty[Int]
        g.foreachNeighbor(v) { u => if (u > v) { ext += u; nbSub(u) = true } }
        extend(1, ext.toList, v)
        g.foreachNeighbor(v) { u => if (u > v) nbSub(u) = false }
        inSub(v) = false
      }
      v += 1
    }
    out.toArray
  }

  /** Classify a connected 4-subset by its induced edge count and degree
    * sequence.
    */
  def classify4(g: LocalGraph, vs: Array[Int]): Pattern4 = {
    require(vs.length == 4)
    val deg = new Array[Int](4)
    var edges = 0
    for (i <- 0 until 4; j <- i + 1 until 4)
      if (g.hasEdge(vs(i), vs(j))) { edges += 1; deg(i) += 1; deg(j) += 1 }
    val ds = deg.sorted.toSeq
    edges match {
      case 3 => if (ds == Seq(1, 1, 1, 3)) Star4 else Path4
      case 4 => if (ds == Seq(2, 2, 2, 2)) Cycle4 else TailedTriangle4
      case 5 => Diamond4
      case 6 => Clique4
      case _ => throw new IllegalArgumentException(s"not a connected 4-set: ${vs.mkString(",")}")
    }
  }

  /** All induced occurrences of one 4-vertex pattern as an InstanceSet. */
  def instances4(g: LocalGraph, p: Pattern4): InstanceSet = {
    val occ = connectedSubsets(g, 4).filter(classify4(g, _) == p)
    InstanceSet(g.n, 4, occ)
  }

  /** Occurrence counts of all six 4-vertex patterns in one enumeration. */
  def counts4(g: LocalGraph): Map[Pattern4, Long] = {
    val counts = mutable.Map.empty[Pattern4, Long].withDefaultValue(0L)
    connectedSubsets(g, 4).foreach(vs => counts(classify4(g, vs)) += 1)
    all4.map(p => p -> counts(p)).toMap
  }
}
