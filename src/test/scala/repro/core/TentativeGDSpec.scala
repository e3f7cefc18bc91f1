package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.clique.CliqueEnum

class TentativeGDSpec extends SparkSpec {

  private def setup(seed: Int, n: Int = 12, p: Double = 0.5, h: Int = 3, iters: Int = 40) = {
    val g = TestGraphs.random(n, p, seed)
    val inst = CliqueEnum.enumerate(g, h)
    val st = KClistPP.fresh(inst, iters)
    (g, inst, st)
  }

  test("blocks partition the vertex set in r-descending order") {
    val (_, inst, st) = setup(1)
    val rBefore = st.r.clone()
    val gd = TentativeGD.run(st)
    assert(gd.blocks.flatten.sorted.toSeq == (0 until inst.n))
    // order is by the PRE-decomposition r, descending
    val o = gd.order
    for (i <- 0 until o.length - 1)
      assert(rBefore(o(i)) > rBefore(o(i + 1)) ||
        (rBefore(o(i)) == rBefore(o(i + 1)) && o(i) < o(i + 1)))
    // block indices are consistent
    for ((b, bi) <- gd.blocks.zipWithIndex; v <- b) assert(gd.blockOf(v) == bi)
  }

  test("α stays feasible after re-assignment") {
    val (_, inst, st) = setup(2)
    TentativeGD.run(st)
    for (i <- 0 until inst.size) {
      assert(math.abs(st.alpha(i).sum - 1.0) < 1e-9)
      assert(st.alpha(i).forall(_ >= 0.0))
    }
    assert(math.abs(st.r.sum - inst.size) < 1e-7)
  }

  test("spanning instances give zero α outside their last block") {
    val (_, inst, st) = setup(3)
    val gd = TentativeGD.run(st)
    for (i <- 0 until inst.size) {
      val mem = inst.members(i)
      val p = mem.map(gd.blockOf).max
      for (j <- mem.indices if gd.blockOf(mem(j)) != p)
        assert(st.alpha(i)(j) == 0.0, s"instance $i member ${mem(j)}")
    }
  }

  test("first break position maximizes prefix density (exact recompute)") {
    val (_, inst, st) = setup(4)
    val rBefore = st.r.clone()
    val gd = TentativeGD.run(st)
    val order = gd.order
    val pos = new Array[Int](inst.n)
    for (i <- order.indices) pos(order(i)) = i
    // exact prefix densities
    val cnt = new Array[Long](inst.n)
    for (m <- inst.members) cnt(m.map(pos).max) += 1
    val cum = cnt.scanLeft(0L)(_ + _).drop(1)
    val p1 = gd.blocks.head.length
    for (q <- 1 to inst.n)
      assert(cum(p1 - 1) * q >= cum(q - 1) * p1,
        s"prefix $p1 not densest vs $q (r order by $rBefore)")
  }

  test("on two bridged cliques the first block is the bigger clique") {
    val g = TestGraphs.twoCliquesBridged(6, 4)
    val inst = CliqueEnum.enumerate(g, 3)
    val st = KClistPP.fresh(inst, 120)
    val gd = TentativeGD.run(st)
    assert(gd.blocks.head.sorted.toSeq == (0 until 6))
  }

  test("single clique collapses to one block") {
    val inst = CliqueEnum.enumerate(repro.graph.LocalGraph.complete(5), 3)
    val st = KClistPP.fresh(inst, 60)
    val gd = TentativeGD.run(st)
    assert(gd.blocks.head.length == 5)
  }

  test("instance-free vertices trail in the last blocks with r = 0") {
    val g = repro.graph.LocalGraph.fromEdges(6, Seq((0, 1), (1, 2), (0, 2), (3, 4)))
    val inst = CliqueEnum.enumerate(g, 3)
    val st = KClistPP.fresh(inst, 30)
    val gd = TentativeGD.run(st)
    assert(gd.blocks.head.sorted.toSeq == Seq(0, 1, 2))
    assert(st.r(3) == 0.0 && st.r(4) == 0.0 && st.r(5) == 0.0)
  }
}
