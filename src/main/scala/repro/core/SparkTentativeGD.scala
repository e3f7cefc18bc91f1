package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Tentative graph decomposition as a Catalyst dataflow.
  *
  * The prefix-density scan of TentativeGD maps 1:1 onto window functions:
  * `row_number` over r-descending gives positions, a per-instance `max` of
  * member positions gives the prefix where each instance first fits, a
  * cumulative-sum window gives prefix instance counts. Only the final
  * suffix-argmax (the partition points) is done on the driver, over the
  * collected (position, count) pairs — n rows of two longs — with exact
  * Long cross-multiplication, matching the local implementation bit for
  * bit. Tests assert the blocks equal [[TentativeGD]]'s.
  */
object SparkTentativeGD {

  /** Compute the TentativeGD partition blocks for an instance DataFrame
    * with columns v1..vh and per-vertex weights `r` over `0 until n`.
    */
  def blocks(spark: SparkSession, instDf: DataFrame, r: Array[Double]): Array[Array[Int]] = {
    import spark.implicits._
    val n = r.length
    val h = instDf.columns.count(_.startsWith("v"))

    val rDf = spark.createDataset(r.toIndexedSeq.zipWithIndex.map { case (rv, v) => (v, rv) })
      .toDF("v", "r")
    val posW = Window.orderBy(desc("r"), asc("v"))
    val posDf = rDf.select(col("v"), (row_number().over(posW) - 1).as("pos")).cache()

    val melted = instDf
      .withColumn("cid", monotonically_increasing_id())
      .select(col("cid"), explode(array((1 to h).map(i => col(s"v$i")): _*)).as("v"))
    val maxPos = melted.join(posDf, "v").groupBy("cid").agg(max("pos").as("mp"))
    val cnts = maxPos.groupBy("mp").agg(count(lit(1)).as("cnt"))

    val cum = posDf.select(col("pos"))
      .join(cnts, posDf("pos") === cnts("mp"), "left")
      .select(col("pos"), coalesce(col("cnt"), lit(0L)).as("cnt"))
      .withColumn("cum", sum("cnt").over(Window.orderBy("pos")))

    val cumArr = new Array[Long](n)
    cum.select("pos", "cum").collect().foreach(row => cumArr(row.getInt(0)) = row.getLong(1))
    val order = new Array[Int](n)
    posDf.collect().foreach(row => order(row.getInt(1)) = row.getInt(0))

    // exact suffix-max of cum(q)/q, identical to TentativeGD.run step 3
    val isBreak = new Array[Boolean](n)
    var bestNum = -1L
    var bestDen = 1L
    var i = n - 1
    while (i >= 0) {
      val q = (i + 1).toLong
      if (cumArr(i) * bestDen >= bestNum * q) {
        isBreak(i) = true
        bestNum = cumArr(i); bestDen = q
      }
      i -= 1
    }
    val out = scala.collection.mutable.ArrayBuffer.empty[Array[Int]]
    var start = 0
    i = 0
    while (i < n) {
      if (isBreak(i)) {
        out += java.util.Arrays.copyOfRange(order, start, i + 1)
        start = i + 1
      }
      i += 1
    }
    posDf.unpersist()
    out.toArray
  }

  /** Instance DataFrame (columns v1..vh) from a local instance set. */
  def instancesDf(spark: SparkSession, inst: InstanceSet): DataFrame = {
    import spark.implicits._
    val h = inst.h
    spark.createDataset(inst.members.toIndexedSeq.map(_.toSeq))
      .select((1 to h).map(i => col("value")(i - 1).as(s"v$i")): _*)
  }
}
