package repro.pipeline

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.{Kind, Merging}
import repro.data.Scenarios
import repro.metrics.RankMetrics

/** End-to-end pipeline checks on a tiny IMDb-like scenario. Quality
  * thresholds are deliberately loose — benches measure real numbers —
  * but the pipeline must rank gold tuples far above random.
  */
class TDMatchSpec extends SparkSpec {

  private lazy val sc = Scenarios.imdb(spark,
    Scenarios.ImdbParams(nMovies = 15, nDirectors = 6, nActors = 10, seed = 77))

  private lazy val cfg = TDMatch.Config(
    maxN = 2, numWalks = 8, walkLength = 8, window = 3, vectorSize = 32, topK = 15, seed = 3)

  private lazy val result = TDMatch.run(spark, sc.queries, sc.candidates, cfg)

  test("pipeline produces a ranking for every query") {
    val qs = result.ranked.select("queryId").distinct().count()
    assert(qs == sc.queries.units.select("docId").distinct().count())
  }
  test("ranking ids are raw document ids (prefixes stripped)") {
    val ids = result.ranked.select("candId").distinct().collect().map(_.getString(0))
    assert(ids.forall(id => !id.startsWith("m2::")))
  }
  test("graph contains both corpora's metadata nodes") {
    val kinds = result.originalGraph.nodes.groupBy("kind").count()
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(kinds(Kind.Meta1) == 30) // 15 movies × 2 reviews
    assert(kinds(Kind.Meta2) == 15)
    assert(kinds.getOrElse(Kind.Attr, 0L) == 13L)
  }
  test("W-RW beats random ranking by a wide margin") {
    val mrr = RankMetrics.mrr(result.ranked, sc.truth)
    // random MRR over 15 candidates ≈ 0.22; demand clear signal
    assert(mrr > 0.35, s"mrr=$mrr")
  }
  test("metadata vectors exist for all query documents") {
    val qIds = sc.queries.units.select("docId").distinct().collect().map(_.getString(0))
    val missing = qIds.filterNot(id => result.vectors.contains(s"m1::$id"))
    assert(missing.isEmpty, s"missing vectors: ${missing.take(5).mkString(",")}")
  }
  test("expansion changes the graph and still ranks") {
    val cfgEx = cfg.copy(expansion = Some(sc.kb))
    val rEx = TDMatch.run(spark, sc.queries, sc.candidates, cfgEx)
    assert(rEx.graph.numNodes != result.originalGraph.numNodes ||
      rEx.graph.numEdges > result.originalGraph.numEdges)
    val mrr = RankMetrics.mrr(rEx.ranked, sc.truth)
    assert(mrr > 0.3, s"mrr=$mrr")
  }
  test("merge dictionary flows through the pipeline") {
    val merge = Merging.dictionaryMap(spark, sc.mergeDict)
    val cfgM = cfg.copy(mergeMap = Some(merge))
    val rM = TDMatch.run(spark, sc.queries, sc.candidates, cfgM)
    val mrr = RankMetrics.mrr(rM.ranked, sc.truth)
    assert(mrr > 0.3, s"mrr=$mrr")
  }
  test("MSP compression path runs end-to-end") {
    val cfgC = cfg.copy(compression = TDMatch.Msp(0.5))
    val rC = TDMatch.run(spark, sc.queries, sc.candidates, cfgC)
    assert(rC.graph.numNodes <= result.originalGraph.numNodes)
    assert(rC.ranked.select("queryId").distinct().count() == 30)
  }
  test("SSuM compression path runs end-to-end") {
    val cfgS = cfg.copy(compression = TDMatch.Ssum(0.9))
    val rS = TDMatch.run(spark, sc.queries, sc.candidates, cfgS)
    assert(rS.ranked.count() > 0)
  }
  test("scores emits a full matrix compatible with averageScores") {
    val s = TDMatch.scores(spark, sc.queries, sc.candidates, result.vectors, cfg.vectorSize)
    assert(s.count() == 30L * 15L)
    assert(s.columns.toSet == Set("queryId", "candId", "sim"))
  }
  test("pipeline is deterministic in seed at the ranking level") {
    val r2 = TDMatch.run(spark, sc.queries, sc.candidates, cfg)
    val a = RankMetrics.mrr(result.ranked, sc.truth)
    val b = RankMetrics.mrr(r2.ranked, sc.truth)
    // Word2Vec training is multi-threaded; allow small drift
    assert(math.abs(a - b) < 0.25, s"$a vs $b")
  }
}
