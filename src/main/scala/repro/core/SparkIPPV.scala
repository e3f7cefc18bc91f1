package repro.core

import org.apache.spark.sql.SparkSession
import repro.clique.SparkCliqueEnum
import repro.graph.{LocalGraph, SparkGraph}

/** Spark-orchestrated IPPV: the distributed-dataflow mapping of the
  * pipeline (DESIGN.md "Spark layering").
  *
  *  - clique enumeration runs as iterated DataFrame self-joins
  *    ([[repro.clique.SparkCliqueEnum]]);
  *  - the propose phase's Frank–Wolfe rounds run distributed when the
  *    instance set is large ([[SparkKClistPP]], injected as the driver's
  *    `fwRunner`), falling back to the sequential SEQ-kClist++ on the
  *    small candidate subproblems deeper in the recursion;
  *  - candidate flow verification can run candidate-parallel on executors
  *    with broadcast graph + instances ([[verifyBatch]]).
  *
  * The driver logic itself ([[IPPV]]) is shared, so Spark and local runs
  * return *identical* LhCDS sets — asserted by the test suite.
  */
object SparkIPPV {

  /** Top-k LhCDSes with distributed clique enumeration + distributed
    * root-level Frank–Wolfe rounds.
    */
  def topK(
      spark: SparkSession,
      g: LocalGraph,
      h: Int,
      k: Int,
      cfg: IPPV.Config = IPPV.Config(),
      distributedFwThreshold: Int = 5000,
  ): Seq[IPPV.Lhcds] = {
    val edges = SparkGraph.fromLocal(spark, g)
    val inst = SparkCliqueEnum.collectInstances(edges, h, g.n)
    val fwRunner: (InstanceSet, Int) => KClistPP.CPState = (sub, iters) =>
      if (sub.size >= distributedFwThreshold) SparkKClistPP.run(spark, sub, iters)
      else KClistPP.fresh(sub, iters)
    IPPV.topK(g, inst, k, cfg.copy(fwRunner = fwRunner))
  }

  /** Verify a batch of candidate vertex sets in parallel, one flow network
    * per task (per-partition verification). Returns the fast-verification
    * verdict for each candidate, in order.
    */
  def verifyBatch(
      spark: SparkSession,
      g: LocalGraph,
      inst: InstanceSet,
      candidates: Seq[Array[Int]],
      ub: Array[Double],
      lb: Array[Double],
      inOutput: Array[Boolean],
  ): Seq[Boolean] = {
    if (candidates.isEmpty) return Seq.empty
    val sc = spark.sparkContext
    val gB = sc.broadcast(g)
    val instB = sc.broadcast(inst)
    val ubB = sc.broadcast(ub)
    val lbB = sc.broadcast(lb)
    val outB = sc.broadcast(inOutput)
    try {
      sc.parallelize(candidates.zipWithIndex, math.min(candidates.size, sc.defaultParallelism))
        .map { case (vs, i) =>
          (i, Verify.fastVerify(gB.value, instB.value, vs, ubB.value, lbB.value, outB.value))
        }
        .collect()
        .sortBy(_._1)
        .map(_._2)
        .toSeq
    } finally {
      gB.destroy(); instB.destroy(); ubB.destroy(); lbB.destroy(); outB.destroy()
    }
  }
}
