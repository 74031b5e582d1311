package repro.graph

import org.apache.spark.sql.{functions => F}
import repro.{Oracle, SparkSpec, TestGraphs}

class BipartiteGraphOpsSpec extends SparkSpec {

  private lazy val local =
    TestGraphs.block(0, 10, 100, 4) ++
      TestGraphs.pairs(1000, 2000, 50) ++
      TestGraphs.star(999, 5000, 30)
  private lazy val edges = {
    import spark.implicits._
    local.toSeq.toDF("u", "v").cache()
  }

  test("vertex id encoding keeps the two sides disjoint and invertible") {
    val us = local.map(_._1).distinct.map(BipartiteGraphOps.encodeUser)
    val vs = local.map(_._2).distinct.map(BipartiteGraphOps.encodeMerchant)
    assert(us.toSet.intersect(vs.toSet).isEmpty)
    assert(us.forall(_ % 2 == 0) && vs.forall(_ % 2 == 1))
  }

  test("toGraphX has one vertex per node and one edge per purchase") {
    val g = BipartiteGraphOps.toGraphX(edges)
    val nU = local.map(_._1).distinct.length
    val nV = local.map(_._2).distinct.length
    assert(g.vertices.count() == nU + nV)
    assert(g.edges.count() == local.distinct.length)
  }

  test("vertex attribute marks the user side") {
    val g = BipartiteGraphOps.toGraphX(edges)
    assert(g.vertices.collect().forall { case (id, isUser) => isUser == (id % 2 == 0) })
  }

  test("GraphX merchant degrees equal the DataFrame groupBy path") {
    val viaGraphX = BipartiteGraphOps.merchantDegrees(spark, edges)
      .collect().map(r => (r.getLong(0), r.getInt(1).toLong)).toMap
    val viaDf = edges.groupBy("v").agg(F.count(F.lit(1)).as("d"))
      .collect().map(r => (r.getLong(0), r.getLong(1))).toMap
    assert(viaGraphX == viaDf)
  }

  test("GraphX merchant degrees match the DuckDB oracle") {
    val deg = BipartiteGraphOps.merchantDegrees(spark, edges)
      .select(F.col("v"), F.col("degree").cast("long").as("degree"))
    Oracle.assertEquivalent(
      deg,
      "SELECT v, count(*) AS degree FROM e GROUP BY v",
      "e" -> edges)
  }

  test("GraphX user degrees equal the DataFrame groupBy path") {
    val viaGraphX = BipartiteGraphOps.userDegrees(spark, edges)
      .collect().map(r => (r.getLong(0), r.getInt(1).toLong)).toMap
    val viaDf = edges.groupBy("u").agg(F.count(F.lit(1)).as("d"))
      .collect().map(r => (r.getLong(0), r.getLong(1))).toMap
    assert(viaGraphX == viaDf)
  }

  test("inducedSubgraph equals the DataFrame double-semijoin") {
    import spark.implicits._
    val users = (1L to 5L).toDF("u")       // half the block users
    val merchants = (101L to 103L).toDF("v") // 3 of 4 block merchants
    val got = BipartiteGraphOps.inducedSubgraph(spark, edges, users, merchants)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val expected = edges
      .join(users, "u").join(merchants, "v")
      .select("u", "v")
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(got == expected)
    assert(got.nonEmpty)
  }

  test("inducedSubgraph with empty node sets is empty") {
    import spark.implicits._
    val got = BipartiteGraphOps.inducedSubgraph(
      spark, edges, Seq.empty[Long].toDF("u"), Seq.empty[Long].toDF("v"))
    assert(got.count() == 0)
  }

  test("inducedSubgraph with all nodes reproduces the full edge set") {
    import spark.implicits._
    val users = local.map(_._1).distinct.toSeq.toDF("u")
    val merchants = local.map(_._2).distinct.toSeq.toDF("v")
    val got = BipartiteGraphOps.inducedSubgraph(spark, edges, users, merchants)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(got == local.distinct.toSet)
  }
}
