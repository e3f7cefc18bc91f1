package repro.bench

import repro.SparkSpec
import repro.experiments.Experiments

/** Fig 11 (density scaling) and Fig 15 (memory) measurements. */
class Fig11DensityBench extends SparkSpec {
  test("Fig 11: running time grows with edge density") {
    val t = Experiments.fig11()
    println("\n=== Fig 11: IPPV runtime vs edge-sampling proportion (h=3, k=5) ===")
    println(t)
    val rows = t.linesIterator.toSeq.drop(2).map(_.split('|').map(_.trim))
    val tri = rows.map(_(4).toLong)
    // densifying the graph increases the h-clique count monotonically —
    // the mechanism the paper names for the runtime growth
    assert(tri == tri.sorted, s"|Psi3| should grow with density: $tri")
    val times = rows.map(_(5).toDouble)
    // soft shape check on wall clock (sub-second timings are noisy):
    // the full graph should not be faster than the sparsest sample
    assert(times.last >= times.head * 0.8,
      s"densest sample unexpectedly much faster: $times")
  }
}

class Fig15MemoryBench extends SparkSpec {
  test("Fig 15: coarse memory accounting of IPPV vs LTDS") {
    val t = Experiments.fig15(datasets = repro.SynthGraphs.benchmarkSuite().take(6))
    println("\n=== Fig 15: approximate heap delta (MB) of IPPV vs LTDS (h=3, k=5) ===")
    println(t)
    assert(t.linesIterator.size >= 6)
  }
}
