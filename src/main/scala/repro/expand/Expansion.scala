package repro.expand

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Graph, Kind}

/** Graph expansion with an external resource (paper Algorithm 2).
  *
  * For every non-metadata node, fetch all its connections in the resource
  * and add the corresponding nodes (kind `kb`) and edges. Then clean the
  * graph by removing sink nodes — nodes of degree 1 that were introduced
  * by the expansion (e.g. `Bhavna Vaswani` connected only to `Shyamalan`).
  *
  * All steps are distributed joins over the `nodes`/`edges`/`triples`
  * DataFrames.
  */
object Expansion {

  /** Expand `g` with `kb`, then drop degree-1 KB nodes. */
  def expand(spark: SparkSession, g: Graph, kb: KnowledgeBase): Graph = {
    val dataNodes = g.nodes.where(!col("kind").isin(Kind.Meta1, Kind.Meta2, Kind.Attr))
      .select(col("id"))

    val t = kb.triples(spark)
    // Triples touching a data node of the graph, in either direction.
    val bySubj = t.join(dataNodes.withColumnRenamed("id", "subject"), "subject")
      .select(col("subject").as("src"), col("object").as("dst"))
    val byObj = t.join(dataNodes.withColumnRenamed("id", "object"), "object")
      .select(col("object").as("src"), col("subject").as("dst"))
    val newEdges = Graph.canonEdges(bySubj.union(byObj))

    val newNodeIds = newEdges.select(col("src").as("id"))
      .union(newEdges.select(col("dst").as("id")))
      .distinct()
      .join(g.nodes.select("id"), Seq("id"), "left_anti")
    val newNodes = newNodeIds.withColumn("kind", lit(Kind.Kb))

    val expanded = Graph(
      g.nodes.union(newNodes),
      Graph.canonEdges(g.edges.union(newEdges)))

    removeSinks(expanded)
  }

  /** Remove degree-≤1 non-metadata nodes (Algorithm 2, cleaning step).
    * One pass, as in the paper; metadata nodes are always kept.
    */
  def removeSinks(g: Graph): Graph = {
    val deg  = g.degrees
    val keep = g.nodes
      .join(deg, Seq("id"), "left")
      .where(
        col("kind").isin(Kind.Meta1, Kind.Meta2, Kind.Attr) ||
          coalesce(col("degree"), lit(0L)) > 1)
      .select("id", "kind")
    Graph(keep, g.edges).consistent
  }
}
