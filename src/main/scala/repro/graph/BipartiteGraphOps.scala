package repro.graph

import org.apache.spark.graphx.{Edge, Graph}
import org.apache.spark.sql.{DataFrame, SparkSession}

/** GraphX substrate for the bipartite 'who buy-from where' graph.
  *
  * The distributed-dataflow reading of the paper maps the ensemble to
  * distributed graph computation; this module provides the GraphX view:
  * encode users on even vertex ids (2u) and merchants on odd ids (2v + 1) so
  * both sides share GraphX's single Long vertex-id space, and expose degree
  * computation and induced-subgraph extraction (the primitive behind node
  * sampling). Each operation is parity-tested against the DataFrame path.
  */
object BipartiteGraphOps {

  /** Encoded user vertex id. */
  def encodeUser(u: Long): Long = 2L * u

  /** Encoded merchant vertex id. */
  def encodeMerchant(v: Long): Long = 2L * v + 1L

  /** Build a GraphX graph from an (u, v) edge DataFrame.
    * Vertex attribute = "is user side".
    */
  def toGraphX(edges: DataFrame): Graph[Boolean, Int] = {
    val eRdd = edges
      .select("u", "v")
      .rdd
      .map(r => Edge(encodeUser(r.getLong(0)), encodeMerchant(r.getLong(1)), 1))
    Graph.fromEdges(eRdd, defaultValue = false).mapVertices((id, _) => id % 2 == 0)
  }

  /** Merchant degrees d_j via GraphX, decoded back to (v, degree). */
  def merchantDegrees(spark: SparkSession, edges: DataFrame): DataFrame = {
    val rdd = toGraphX(edges).degrees
      .filter { case (vid, _) => vid % 2 == 1 }
      .map { case (vid, d) => ((vid - 1) / 2, d) }
    spark.createDataFrame(rdd).toDF("v", "degree")
  }

  /** User degrees via GraphX, decoded back to (u, degree). */
  def userDegrees(spark: SparkSession, edges: DataFrame): DataFrame = {
    val rdd = toGraphX(edges).degrees
      .filter { case (vid, _) => vid % 2 == 0 }
      .map { case (vid, d) => (vid / 2, d) }
    spark.createDataFrame(rdd).toDF("u", "degree")
  }

  /** Induced bipartite subgraph on (users × merchants) via GraphX.subgraph —
    * the primitive behind two-side node sampling. Node sets are broadcast.
    */
  def inducedSubgraph(
      spark: SparkSession,
      edges: DataFrame,
      users: DataFrame,
      merchants: DataFrame): DataFrame = {
    val uSet = spark.sparkContext.broadcast(
      users.select("u").collect().map(_.getLong(0)).toSet)
    val vSet = spark.sparkContext.broadcast(
      merchants.select("v").collect().map(_.getLong(0)).toSet)
    val sub = toGraphX(edges).subgraph(vpred = (id, _) =>
      if (id % 2 == 0) uSet.value(id / 2) else vSet.value((id - 1) / 2))
    val rdd = sub.edges.map(e => (e.srcId / 2, (e.dstId - 1) / 2))
    spark.createDataFrame(rdd).toDF("u", "v")
  }
}
