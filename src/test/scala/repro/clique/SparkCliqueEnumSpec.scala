package repro.clique

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.graph.{LocalGraph, SparkGraph}

class SparkCliqueEnumSpec extends SparkSpec {

  private def sets(inst: repro.core.InstanceSet): Set[Seq[Int]] =
    inst.members.map(_.toSeq).toSet

  for (seed <- 1 to 6; h <- 2 to 5) {
    test(s"distributed enumeration equals local kClist (seed=$seed, h=$h)") {
      val g = TestGraphs.random(16, 0.4, seed + 5000)
      val viaSpark = SparkCliqueEnum.fromLocal(spark, g, h)
      val viaLocal = CliqueEnum.enumerate(g, h)
      assert(sets(viaSpark) == sets(viaLocal), s"seed=$seed h=$h")
    }
  }

  test("K7 counts via the DataFrame pipeline") {
    val df = SparkGraph.fromLocal(spark, LocalGraph.complete(7))
    assert(SparkCliqueEnum.count(df, 3) == 35)
    assert(SparkCliqueEnum.count(df, 4) == 35)
    assert(SparkCliqueEnum.count(df, 5) == 21)
  }

  test("triangle count cross-checked against the DuckDB oracle") {
    val g = TestGraphs.random(40, 0.25, 11)
    val edges = SparkGraph.fromLocal(spark, g) // src < dst canonical
    val sparkCount = spark.createDataFrame(
      java.util.List.of[org.apache.spark.sql.Row](
        org.apache.spark.sql.Row(SparkCliqueEnum.count(edges, 3))),
      new org.apache.spark.sql.types.StructType()
        .add("triangles", org.apache.spark.sql.types.LongType))
    Oracle.assertEquivalent(
      sparkCount,
      """SELECT count(*) AS triangles
        |FROM e x JOIN e y ON y.src = x.src
        |                  AND CAST(y.dst AS INT) > CAST(x.dst AS INT)
        |         JOIN e z ON z.src = x.dst AND z.dst = y.dst""".stripMargin,
      "e" -> edges,
    )
  }

  test("4-clique count cross-checked against the DuckDB oracle") {
    val g = TestGraphs.random(25, 0.35, 12)
    val edges = SparkGraph.fromLocal(spark, g)
    val sparkCount = spark.createDataFrame(
      java.util.List.of[org.apache.spark.sql.Row](
        org.apache.spark.sql.Row(SparkCliqueEnum.count(edges, 4))),
      new org.apache.spark.sql.types.StructType()
        .add("k4", org.apache.spark.sql.types.LongType))
    Oracle.assertEquivalent(
      sparkCount,
      """SELECT count(*) AS k4
        |FROM e ab JOIN e ac ON ac.src = ab.src
        |                    AND CAST(ac.dst AS INT) > CAST(ab.dst AS INT)
        |          JOIN e ad ON ad.src = ab.src
        |                    AND CAST(ad.dst AS INT) > CAST(ac.dst AS INT)
        |          JOIN e bc ON bc.src = ab.dst AND bc.dst = ac.dst
        |          JOIN e bd ON bd.src = ab.dst AND bd.dst = ad.dst
        |          JOIN e cd ON cd.src = ac.dst AND cd.dst = ad.dst""".stripMargin,
      "e" -> edges,
    )
  }

  test("triangle-free graph gives empty result") {
    val df = SparkGraph.fromLocal(spark, TestGraphs.petersen())
    assert(SparkCliqueEnum.count(df, 3) == 0)
  }

  test("collectInstances members are id-sorted and deduplicated") {
    val g = TestGraphs.random(14, 0.45, 13)
    val inst = SparkCliqueEnum.fromLocal(spark, g, 3)
    assert(inst.members.forall(m => m.sorted.sameElements(m)))
    assert(inst.members.map(_.toSeq).distinct.length == inst.size)
  }
}
