package repro.pipeline

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.compress.{MSP, SSuM}
import repro.embed.Embeddings
import repro.expand.{Expansion, KnowledgeBase}
import repro.matching.Matcher
import repro.walk.RandomWalks

/** End-to-end TDmatch pipeline: graph → (merge) → (expand) → (compress) →
  * walks → Word2Vec → top-k matching (paper Figure 3).
  *
  * The configuration exposes every knob the paper ablates: n-gram size,
  * walk count/length, Word2Vec window, merging, expansion resource and
  * compression method.
  */
object TDMatch {

  sealed trait Compression
  case object NoCompression extends Compression
  final case class Msp(beta: Double) extends Compression
  final case class Ssum(keepFraction: Double) extends Compression

  final case class Config(
      maxN: Int = 3,
      numWalks: Int = 20,
      walkLength: Int = 15,
      window: Int = 3,
      vectorSize: Int = 64,
      w2vIterations: Int = 1,
      mergeMap: Option[DataFrame] = None,
      expansion: Option[KnowledgeBase] = None,
      compression: Compression = NoCompression,
      topK: Int = 20,
      seed: Long = 42)

  final case class Result(
      graph: Graph,
      originalGraph: Graph,
      vectors: Map[String, Array[Float]],
      /** `(queryId, candId, sim, rank)` over raw document ids. */
      ranked: DataFrame,
      /** Wall-clock: graph + walks + Word2Vec (the paper's "train"). */
      trainSec: Double = 0.0,
      /** Wall-clock: matching all queries (the paper's "test"). */
      testSec: Double = 0.0)

  /** Build the graph for corpora `a` (queries, `m1::` ids) and `b`
    * (candidates, `m2::` ids), run the pipeline, and rank each document
    * of `a` against all documents of `b`.
    */
  def run(spark: SparkSession, a: Corpus, b: Corpus, cfg: Config): Result = {
    val t0 = System.nanoTime()
    val base = GraphBuilder
      .build(spark, a, b, GraphBuilder.Config(maxN = cfg.maxN, mergeMap = cfg.mergeMap))
      .persist()

    val expanded = cfg.expansion match {
      case Some(kb) => Expansion.expand(spark, base, kb).persist()
      case None     => base
    }

    val graph = cfg.compression match {
      case NoCompression => expanded
      case Msp(beta)     => MSP.compress(spark, expanded, beta, cfg.seed).persist()
      case Ssum(f)       => SSuM.compress(spark, expanded, f, cfg.seed).persist()
    }

    val (vectors, ranked, trainSec, testSec) = embedAndRank(spark, graph, a, b, cfg, t0)
    Result(graph, base, vectors, ranked, trainSec, testSec)
  }

  /** Walks → Word2Vec → ranking over a prebuilt graph (used by the
    * compression benches that reuse one expanded graph for many variants).
    */
  def embedAndRank(
      spark: SparkSession,
      graph: Graph,
      a: Corpus, b: Corpus,
      cfg: Config,
      trainStartNanos: Long = System.nanoTime())
      : (Map[String, Array[Float]], DataFrame, Double, Double) = {
    val sentences = RandomWalks.walks(spark, graph, cfg.numWalks, cfg.walkLength, cfg.seed)
    val vectors = Embeddings.train(
      spark, sentences,
      Embeddings.Config(cfg.vectorSize, cfg.window, 1, cfg.w2vIterations, cfg.seed))
    val trainSec = (System.nanoTime() - trainStartNanos) / 1e9

    val t1 = System.nanoTime()
    val ranked = TDMatch.rank(spark, a, b, vectors, cfg.vectorSize, cfg.topK).persist()
    ranked.count()
    val testSec = (System.nanoTime() - t1) / 1e9
    (vectors, ranked, trainSec, testSec)
  }

  /** Rank `b` documents for every `a` document using node vectors. */
  def rank(
      spark: SparkSession,
      a: Corpus, b: Corpus,
      vectors: Map[String, Array[Float]],
      dim: Int,
      topK: Int): DataFrame = {
    import org.apache.spark.sql.functions._
    val qIds = a.units.select("docId").distinct().collect().map(r => Graph.metaId1(r.getString(0)))
    val cIds = b.units.select("docId").distinct().collect().map(r => Graph.metaId2(r.getString(0)))
    val queries    = Matcher.embeddingDf(spark, qIds.toIndexedSeq, vectors, dim)
    val candidates = Matcher.embeddingDf(spark, cIds.toIndexedSeq, vectors, dim)
    Matcher.topK(queries, candidates, topK)
      .withColumn("queryId", expr("substring(queryId, 5)"))
      .withColumn("candId", expr("substring(candId, 5)"))
  }

  /** Full similarity matrix over raw ids (for score averaging with a
    * pretrained baseline, paper §V-F2).
    */
  def scores(
      spark: SparkSession,
      a: Corpus, b: Corpus,
      vectors: Map[String, Array[Float]],
      dim: Int): DataFrame = {
    import org.apache.spark.sql.functions._
    val qIds = a.units.select("docId").distinct().collect().map(r => Graph.metaId1(r.getString(0)))
    val cIds = b.units.select("docId").distinct().collect().map(r => Graph.metaId2(r.getString(0)))
    val queries    = Matcher.embeddingDf(spark, qIds.toIndexedSeq, vectors, dim)
    val candidates = Matcher.embeddingDf(spark, cIds.toIndexedSeq, vectors, dim)
    Matcher.allScores(queries, candidates)
      .withColumn("queryId", expr("substring(queryId, 5)"))
      .withColumn("candId", expr("substring(candId, 5)"))
  }
}
