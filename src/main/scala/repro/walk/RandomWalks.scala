package repro.walk

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Graph

/** Random-walk corpus generation (paper Algorithm 4).
  *
  * `n` walks of length `l` start from every graph node; each step moves to
  * a uniformly random neighbor. Every walk becomes one "sentence" whose
  * words are node labels; the union of sentences is the Word2Vec training
  * corpus.
  *
  * Implemented as `l-1` distributed joins against the grouped adjacency
  * (`node → [neighbors]`); deterministic in `seed`.
  */
object RandomWalks {

  /** Returns a DataFrame `(sentence: Array[String])` with `n · |V|` rows. */
  def walks(spark: SparkSession, g: Graph, n: Int, l: Int, seed: Long = 13): DataFrame = {
    val adj = g.adjacency
      .groupBy(col("src").as("node"))
      .agg(collect_list(col("dst")).as("nbrs"))
      .persist()

    val starts = g.nodes.select(col("id"))
      .crossJoin(spark.range(n).select(col("id").as("walk")))
      .select(col("id").as("cur"), array(col("id")).as("sentence"))

    var cur = starts
    var step = 1
    while (step < l) {
      val stepped = cur
        .join(adj.withColumnRenamed("node", "cur"), Seq("cur"), "left")
        .withColumn(
          "next",
          when(col("nbrs").isNotNull && size(col("nbrs")) > 0,
            element_at(
              col("nbrs"),
              (floor(rand(seed + step) * size(col("nbrs"))) + 1).cast("int")))
            .otherwise(lit(null)))
        .select(
          coalesce(col("next"), col("cur")).as("cur"),
          when(col("next").isNotNull, concat(col("sentence"), array(col("next"))))
            .otherwise(col("sentence"))
            .as("sentence"))
      // Cut lineage periodically: 30 chained joins otherwise blow up the plan.
      cur =
        if (step % 5 == 0) stepped.localCheckpoint(true)
        else stepped
      step += 1
    }
    val out = cur.select("sentence")
    adj.unpersist()
    out
  }
}
