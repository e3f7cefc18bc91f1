package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.clique.CliqueEnum
import repro.graph.LocalGraph

class KClistPPSpec extends SparkSpec {

  private def feasible(state: KClistPP.CPState): Unit = {
    val inst = state.inst
    for (i <- 0 until inst.size) {
      val s = state.alpha(i).sum
      assert(math.abs(s - 1.0) < 1e-9, s"instance $i α-sum $s")
      assert(state.alpha(i).forall(_ >= -1e-15))
    }
    // r must equal the column sums of α
    val r2 = new Array[Double](inst.n)
    for (i <- 0 until inst.size; j <- 0 until inst.h)
      r2(inst.members(i)(j)) += state.alpha(i)(j)
    for (v <- 0 until inst.n)
      assert(math.abs(r2(v) - state.r(v)) < 1e-7, s"r($v) drift")
  }

  test("initial state splits each instance evenly") {
    val inst = CliqueEnum.enumerate(LocalGraph.complete(4), 3)
    val st = new KClistPP.CPState(inst)
    assert(st.alpha.forall(_.forall(a => math.abs(a - 1.0 / 3) < 1e-15)))
    // each vertex of K4 is in C(3,2)=3 triangles -> r = 1
    assert(st.r.forall(r => math.abs(r - 1.0) < 1e-12))
  }

  test("Σ r(u) always equals |Ψ| (feasibility)") {
    val g = TestGraphs.random(12, 0.5, 3)
    val inst = CliqueEnum.enumerate(g, 3)
    val st = KClistPP.fresh(inst, 25)
    assert(math.abs(st.r.sum - inst.size) < 1e-7)
    feasible(st)
  }

  test("objective stays within a band of the optimum on a clique") {
    // On K6 the uniform start is already CP-optimal (Σ r² = 6·(20/6)²);
    // fixed-step Frank–Wolfe may wobble slightly but must stay near it.
    val inst = CliqueEnum.enumerate(LocalGraph.complete(6), 3)
    val st = new KClistPP.CPState(inst)
    val opt = st.objective
    for (_ <- 1 to 10) {
      KClistPP.run(st, 5)
      assert(st.objective >= opt - 1e-9)       // optimum is a lower bound
      assert(st.objective <= opt * 1.01)       // and FW stays within 1%
    }
  }

  test("objective decreases from a deliberately skewed start") {
    val inst = CliqueEnum.enumerate(LocalGraph.complete(6), 3)
    val st = new KClistPP.CPState(inst)
    // give all weight to the first member of each instance
    for (i <- 0 until inst.size) {
      st.alpha(i) = Array(1.0, 0.0, 0.0)
    }
    java.util.Arrays.fill(st.r, 0.0)
    for (i <- 0 until inst.size) st.r(inst.members(i)(0)) += 1.0
    val before = st.objective
    KClistPP.run(st, 50)
    assert(st.objective < before)
  }

  test("on a single clique r converges to the uniform compact number") {
    // K5, h=3: every vertex has φ = C(4,2) * ... = 10 triangles / 5 vertices = 2
    val inst = CliqueEnum.enumerate(LocalGraph.complete(5), 3)
    val st = KClistPP.fresh(inst, 200)
    assert(st.r.forall(r => math.abs(r - 2.0) < 0.05), st.r.toSeq.toString)
  }

  test("r separates a dense clique from a sparse tail") {
    val g = TestGraphs.twoCliquesBridged(6, 3) // K6 + K3 bridged
    val inst = CliqueEnum.enumerate(g, 3)
    val st = KClistPP.fresh(inst, 100)
    val denseMin = (0 until 6).map(st.r(_)).min
    val sparseMax = (6 until 9).map(st.r(_)).max
    assert(denseMin > sparseMax, s"dense=$denseMin sparse=$sparseMax")
  }

  test("warm start continues the γ_t schedule") {
    val inst = CliqueEnum.enumerate(TestGraphs.random(10, 0.5, 9), 3)
    val a = KClistPP.fresh(inst, 30)
    val b = KClistPP.run(KClistPP.fresh(inst, 10), 20)
    assert(a.t == 30 && b.t == 30)
    for (v <- 0 until inst.n)
      assert(math.abs(a.r(v) - b.r(v)) < 1e-12)
  }

  test("r approximates exact compact numbers on tiny graphs (Theorem 2)") {
    for (seed <- 1 to 4) {
      val g = TestGraphs.random(9, 0.5, seed + 40)
      val inst = CliqueEnum.enumerate(g, 3)
      if (inst.size > 0) {
        val st = KClistPP.fresh(inst, 600)
        val phi = BruteForce.compactNumbers(g, inst)
        for (v <- 0 until g.n) {
          val exact = phi(v)._1.toDouble / phi(v)._2
          assert(math.abs(st.r(v) - exact) < 0.12,
            s"seed=$seed v=$v r=${st.r(v)} φ=$exact")
        }
      }
    }
  }

  test("feasibility holds on pattern instances too") {
    val g = TestGraphs.random(10, 0.5, 8)
    val inst = repro.pattern.PatternEnum.instances4(g, repro.pattern.PatternEnum.Cycle4)
    if (inst.size > 0) feasible(KClistPP.fresh(inst, 40))
  }
}
