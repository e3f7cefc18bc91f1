package repro.core

import scala.collection.mutable

/** A set of pattern instances over a vertex space `0 until n`.
  *
  * An *instance* is a set of `h` distinct vertices (an h-clique for the
  * LhCDS problem, or an occurrence of a 4-vertex pattern for LhxPDS —
  * §5 of the paper). An instance is destroyed when any of its members is
  * removed. Every stage of the IPPV pipeline (density, compactness, cores,
  * convex-program weights, flow networks, verification) consumes only this
  * abstraction, which is what makes the general-pattern extension of the
  * paper a drop-in.
  *
  * Member arrays are sorted ascending; the instance list is
  * lexicographically sorted for determinism.
  */
final class InstanceSet(val n: Int, val h: Int, val members: Array[Array[Int]])
    extends Serializable {

  /** Number of instances |Ψ|. */
  def size: Int = members.length

  /** Instance degree deg(v, ψ) for every vertex. */
  lazy val degrees: Array[Int] = {
    val d = new Array[Int](n)
    var i = 0
    while (i < members.length) {
      val inst = members(i)
      var j = 0
      while (j < inst.length) { d(inst(j)) += 1; j += 1 }
      i += 1
    }
    d
  }

  /** Indices of the instances containing each vertex (CSR). */
  lazy val byVertex: (Array[Int], Array[Int]) = {
    val off = new Array[Int](n + 1)
    var i = 0
    while (i < n) { off(i + 1) = off(i) + degrees(i); i += 1 }
    val pos = off.clone()
    val lists = new Array[Int](off(n))
    i = 0
    while (i < members.length) {
      val inst = members(i)
      var j = 0
      while (j < inst.length) { lists(pos(inst(j))) = i; pos(inst(j)) += 1; j += 1 }
      i += 1
    }
    (off, lists)
  }

  /** Apply `f` to the index of every instance containing `v`. */
  @inline def foreachInstanceOf(v: Int)(f: Int => Unit): Unit = {
    val (off, lists) = byVertex
    var i = off(v)
    while (i < off(v + 1)) { f(lists(i)); i += 1 }
  }

  /** Instance density |Ψ(G[S])| / |S| as an exact rational (count, size). */
  def densityOf(vs: Array[Int]): (Long, Int) = {
    val mask = new Array[Boolean](n)
    vs.foreach(mask(_) = true)
    (countWithin(mask), vs.length)
  }

  /** Number of instances fully inside `mask`. */
  def countWithin(mask: Array[Boolean]): Long = {
    var c = 0L
    var i = 0
    while (i < members.length) {
      val inst = members(i)
      var ok = true
      var j = 0
      while (ok && j < inst.length) { ok = mask(inst(j)); j += 1 }
      if (ok) c += 1
      i += 1
    }
    c
  }

  /** Instances fully inside `mask`, in the SAME vertex-id space. */
  def restrictTo(mask: Array[Boolean]): InstanceSet = {
    val keep = mutable.ArrayBuffer.empty[Array[Int]]
    var i = 0
    while (i < members.length) {
      val inst = members(i)
      var ok = true
      var j = 0
      while (ok && j < inst.length) { ok = mask(inst(j)); j += 1 }
      if (ok) keep += inst
      i += 1
    }
    new InstanceSet(n, h, keep.toArray)
  }

  /** Instances fully inside the subset, remapped to ids `0 until vs.length`
    * where `vs` is sorted ascending and `vs(newId) = oldId`.
    */
  def remapTo(vs: Array[Int]): InstanceSet = {
    val newId = new Array[Int](n)
    java.util.Arrays.fill(newId, -1)
    var i = 0
    while (i < vs.length) { newId(vs(i)) = i; i += 1 }
    val keep = mutable.ArrayBuffer.empty[Array[Int]]
    i = 0
    while (i < members.length) {
      val inst = members(i)
      var ok = true
      var j = 0
      while (ok && j < inst.length) { ok = newId(inst(j)) >= 0; j += 1 }
      if (ok) keep += inst.map(newId)
      i += 1
    }
    new InstanceSet(vs.length, h, keep.toArray)
  }
}

object InstanceSet {
  /** Build from raw member arrays; sorts members and the instance list. */
  def apply(n: Int, h: Int, raw: Iterable[Array[Int]]): InstanceSet = {
    val sorted = raw.map { a =>
      val c = a.clone(); java.util.Arrays.sort(c)
      require(c.length == h, s"instance arity ${c.length} != h=$h")
      c
    }.toArray
    java.util.Arrays.sort(sorted, (x: Array[Int], y: Array[Int]) => {
      var i = 0
      var r = 0
      while (r == 0 && i < x.length) { r = Integer.compare(x(i), y(i)); i += 1 }
      r
    })
    new InstanceSet(n, h, sorted)
  }
}
