package repro.core

import repro.SparkSpec

class InstanceSetSpec extends SparkSpec {

  private val inst = InstanceSet(6, 3, Seq(
    Array(2, 0, 1), Array(1, 2, 3), Array(3, 4, 5)))

  test("members are sorted within and across instances") {
    assert(inst.members.map(_.toSeq).toSeq ==
      Seq(Seq(0, 1, 2), Seq(1, 2, 3), Seq(3, 4, 5)))
  }

  test("arity is enforced") {
    intercept[IllegalArgumentException](InstanceSet(4, 3, Seq(Array(0, 1))))
  }

  test("degrees count containing instances") {
    assert(inst.degrees.toSeq == Seq(1, 2, 2, 2, 1, 1))
  }

  test("byVertex navigation") {
    var seen = List.empty[Int]
    inst.foreachInstanceOf(2)(seen ::= _)
    assert(seen.sorted == List(0, 1))
  }

  test("countWithin and densityOf") {
    val mask = Array(true, true, true, true, false, false)
    assert(inst.countWithin(mask) == 2)
    val (num, den) = inst.densityOf(Array(0, 1, 2))
    assert(num == 1 && den == 3)
  }

  test("restrictTo keeps ids, drops crossing instances") {
    val r = inst.restrictTo(Array(true, true, true, true, false, false))
    assert(r.n == 6 && r.size == 2)
    assert(r.members.map(_.toSeq).toSeq == Seq(Seq(0, 1, 2), Seq(1, 2, 3)))
  }

  test("remapTo renumbers into the subset space") {
    val r = inst.remapTo(Array(1, 2, 3))
    assert(r.n == 3 && r.size == 1)
    assert(r.members.head.toSeq == Seq(0, 1, 2))
  }

  test("empty instance set behaves") {
    val e = InstanceSet(3, 2, Seq.empty)
    assert(e.size == 0 && e.degrees.toSeq == Seq(0, 0, 0))
    assert(e.countWithin(Array(true, true, true)) == 0)
  }
}
