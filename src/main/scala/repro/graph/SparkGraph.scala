package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** DataFrame representation of an undirected graph: one row per edge with
  * columns `src`, `dst` (Int). Canonical form has src < dst, no self
  * loops, no duplicates — established by [[canonicalize]] so the Catalyst
  * pipeline downstream (clique joins, decomposition windows) can rely on
  * it.
  */
object SparkGraph {

  /** Canonicalize an arbitrary (src, dst) edge DataFrame: drop loops,
    * normalize direction to src < dst, dedup.
    */
  def canonicalize(edges: DataFrame): DataFrame = {
    edges
      .select(
        least(col("src"), col("dst")).cast("int").as("src"),
        greatest(col("src"), col("dst")).cast("int").as("dst"),
      )
      .where(col("src") =!= col("dst"))
      .distinct()
  }

  /** Edge DataFrame (canonical) from a local graph. */
  def fromLocal(spark: SparkSession, g: LocalGraph): DataFrame = {
    import spark.implicits._
    spark.createDataset(g.edges.map { case (u, v) => (u, v) }).toDF("src", "dst")
  }

  /** Collect a canonical edge DataFrame back into a LocalGraph over
    * `0 until n`.
    */
  def toLocal(edges: DataFrame, n: Int): LocalGraph = {
    val es = edges.select(col("src").cast("int"), col("dst").cast("int"))
      .collect().map(r => (r.getInt(0), r.getInt(1)))
    LocalGraph.fromEdges(n, es)
  }

  /** Degrees of every vertex appearing in the edge list. */
  def degrees(edges: DataFrame): DataFrame = {
    edges.select(col("src").as("v"))
      .unionAll(edges.select(col("dst").as("v")))
      .groupBy("v").agg(count(lit(1)).cast("int").as("deg"))
  }

  /** Orient each undirected edge from the (degree, id)-smaller endpoint to
    * the larger: output columns `a` -> `b`. This total order is what makes
    * the iterated clique joins emit each clique exactly once.
    */
  def orientByDegree(edges: DataFrame): DataFrame = {
    val deg = degrees(edges)
    val e = edges
      .join(deg.withColumnRenamed("v", "src").withColumnRenamed("deg", "sdeg"), "src")
      .join(deg.withColumnRenamed("v", "dst").withColumnRenamed("deg", "ddeg"), "dst")
    e.select(
      when(col("sdeg") < col("ddeg") ||
           (col("sdeg") === col("ddeg") && col("src") < col("dst")),
           col("src")).otherwise(col("dst")).as("a"),
      when(col("sdeg") < col("ddeg") ||
           (col("sdeg") === col("ddeg") && col("src") < col("dst")),
           col("dst")).otherwise(col("src")).as("b"),
    )
  }
}
