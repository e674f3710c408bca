package repro.matching

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Unsupervised metadata-node matching (paper §IV-B).
  *
  * Given embedding vectors for query documents and candidate documents,
  * computes the cosine top-k candidates per query with a distributed
  * cross join + window ranking. Output: `(queryId, candId, sim, rank)`
  * with rank 1 = most similar.
  */
object Matcher {

  private val cosineUdf = udf { (a: Seq[Float], b: Seq[Float]) =>
    var dot = 0.0; var na = 0.0; var nb = 0.0; var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }

  /** Build an embedding DataFrame `(id, vec)` from a vocabulary map,
    * restricted to the given ids; ids missing from the map get the zero
    * vector (they still receive a deterministic arbitrary ranking).
    */
  def embeddingDf(
      spark: SparkSession,
      ids: Seq[String],
      vectors: Map[String, Array[Float]],
      dim: Int): DataFrame = {
    import spark.implicits._
    ids.map(id => (id, vectors.getOrElse(id, new Array[Float](dim)).toSeq))
      .toDF("id", "vec")
  }

  /** Top-k most similar candidates per query by cosine similarity.
    * Ties broken by candidate id for determinism.
    */
  def topK(queries: DataFrame, candidates: DataFrame, k: Int): DataFrame = {
    val scored = queries.select(col("id").as("queryId"), col("vec").as("qv"))
      .crossJoin(candidates.select(col("id").as("candId"), col("vec").as("cv")))
      .withColumn("sim", cosineUdf(col("qv"), col("cv")))
    val w = Window.partitionBy("queryId").orderBy(col("sim").desc, col("candId").asc)
    scored
      .withColumn("rank", row_number().over(w))
      .where(col("rank") <= k)
      .select("queryId", "candId", "sim", "rank")
  }

  /** Average two score sets (paper §V-F2: combining our cosine scores
    * with SentenceBERT's improves all scenarios). Both inputs must be
    * full score matrices `(queryId, candId, sim)`.
    */
  def averageScores(a: DataFrame, b: DataFrame, k: Int): DataFrame = {
    val joined = a.select(col("queryId"), col("candId"), col("sim").as("simA"))
      .join(b.select(col("queryId"), col("candId"), col("sim").as("simB")),
        Seq("queryId", "candId"), "outer")
      .withColumn("sim",
        (coalesce(col("simA"), lit(0.0)) + coalesce(col("simB"), lit(0.0))) / 2.0)
    val w = Window.partitionBy("queryId").orderBy(col("sim").desc, col("candId").asc)
    joined
      .withColumn("rank", row_number().over(w))
      .where(col("rank") <= k)
      .select("queryId", "candId", "sim", "rank")
  }

  /** Full score matrix (no top-k cut) — input to [[averageScores]]. */
  def allScores(queries: DataFrame, candidates: DataFrame): DataFrame =
    queries.select(col("id").as("queryId"), col("vec").as("qv"))
      .crossJoin(candidates.select(col("id").as("candId"), col("vec").as("cv")))
      .withColumn("sim", cosineUdf(col("qv"), col("cv")))
      .select("queryId", "candId", "sim")
}
