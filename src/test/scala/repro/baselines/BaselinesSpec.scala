package repro.baselines

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.{TableCorpus, TextCorpus}
import repro.data.World

class BaselinesSpec extends SparkSpec {
  import spark.implicits._

  private lazy val table = TableCorpus("t",
    Seq(("1", "alpha beta", "100"), ("2", "gamma delta", "200"))
      .toDF("docId", "name", "value"), "docId")
  private lazy val texts = TextCorpus("x",
    Seq(("p1", "alpha beta words"), ("p2", "gamma delta words")).toDF("docId", "text"))

  // ---- DocTokens ---------------------------------------------------------

  test("DocTokens serializes tables with col/val markers") {
    val m = DocTokens.map(spark, table)
    assert(m("1").containsSlice(Seq("colmark", "name", "valmark", "alpha", "beta")))
  }
  test("DocTokens without markers omits them") {
    val m = DocTokens.map(spark, table, markers = false)
    assert(!m("1").contains("colmark"))
    assert(m("1").contains("alpha"))
  }
  test("DocTokens concatenates text sentences") {
    val m = DocTokens.map(spark, texts)
    assert(m("p1") == Seq("alpha", "beta", "word"))
  }
  test("DocTokens grouping matches DuckDB token counts") {
    val df = DocTokens.of(spark, texts).select(col("docId"),
      size(col("tokens")).cast("string").as("n"))
    val units = texts.units.select("docId", "unit")
    Oracle.assertEquivalent(df,
      """SELECT docId, CAST(SUM(3) AS VARCHAR) AS n FROM units GROUP BY docId""",
      "units" -> units) // every unit here has exactly 3 terms
  }

  // ---- Supervised features ----------------------------------------------

  private val idfM = Supervised.idf(Seq(Seq("a", "b"), Seq("a", "c")))

  test("idf gives rarer tokens higher weight") {
    assert(idfM("b") > idfM("a"))
  }
  test("idf matches DuckDB document-frequency computation") {
    val docs = Seq(("d1", "a"), ("d1", "b"), ("d2", "a"), ("d2", "c")).toDF("docId", "tok")
    val dfCounts = docs.distinct().groupBy("tok")
      .agg(count("*").cast("string").as("df"))
    Oracle.assertEquivalent(dfCounts,
      "SELECT tok, CAST(COUNT(DISTINCT docId) AS VARCHAR) AS df FROM docs GROUP BY tok",
      "docs" -> docs)
  }
  test("tfidfVec weights term frequency by idf") {
    val v = Supervised.tfidfVec(Seq("a", "a", "b"), idfM)
    assert(v("a") == 2 * idfM("a") && v("b") == idfM("b"))
  }

  private def mkView(tokens: String*) =
    Supervised.view(tokens.toSeq, idfM, Map.empty, 4)

  test("features: identical docs score 1 on overlap features") {
    val v = mkView("a", "b")
    val f = Supervised.features(v, v)
    assert(f(0) == 1.0) // unigram jaccard
    assert(f(5) == 1.0) // containment
    assert(f(6) == 1.0) // length ratio
  }
  test("features: disjoint docs score 0") {
    val f = Supervised.features(mkView("a", "b"), mkView("x", "y"))
    assert(f(0) == 0.0 && f(2) == 0.0 && f(5) == 0.0)
  }
  test("features: numeric overlap tolerates 2% deviation") {
    val f = Supervised.features(mkView("100"), mkView("101"))
    assert(f(4) == 1.0)
    val f2 = Supervised.features(mkView("100"), mkView("200"))
    assert(f2(4) == 0.0)
  }
  test("features: bigram jaccard sees order") {
    val f = Supervised.features(mkView("a", "b", "c"), mkView("c", "b", "a"))
    assert(f(0) == 1.0 && f(1) == 0.0)
  }

  test("split is deterministic 60/40") {
    val (tr, te) = Supervised.split((1 to 10).map(i => s"q$i"))
    assert(tr.size == 6 && te.size == 4)
    assert((tr ++ te).toSet == (1 to 10).map(i => s"q$i").toSet)
  }

  test("supervised ranker learns an overlap-separable task") {
    val w = new World(9)
    val a = TextCorpus("qs", (0 until 10).map(i => (s"q$i", s"token$i filler$i common")).toDF("docId", "text"))
    val b = TextCorpus("cs", (0 until 10).map(i => (s"c$i", s"token$i other$i common")).toDF("docId", "text"))
    val truthPairs = (0 until 10).map(i => (s"q$i", s"c$i"))
    val out = Supervised.run(spark, w, Supervised.Rank, a, b, truthPairs, k = 5, dim = 8)
    // held-out queries should rank their paraphrase first
    val top1 = out.ranked.where(col("rank") === 1)
      .collect().map(r => (r.getString(0), r.getString(1)))
    assert(top1.nonEmpty)
    val correct = top1.count { case (q, c) => c.drop(1) == q.drop(1) }
    assert(correct >= top1.length / 2, s"got ${top1.mkString(",")}")
  }
  test("supervised run only ranks held-out queries") {
    val w = new World(9)
    val a = TextCorpus("qs", (0 until 10).map(i => (s"q$i", s"tok$i x")).toDF("docId", "text"))
    val b = TextCorpus("cs", (0 until 10).map(i => (s"c$i", s"tok$i y")).toDF("docId", "text"))
    val truthPairs = (0 until 10).map(i => (s"q$i", s"c$i"))
    val out = Supervised.run(spark, w, Supervised.Ditto, a, b, truthPairs, k = 3, dim = 8)
    val qids = out.ranked.select("queryId").distinct().collect().map(_.getString(0)).toSet
    val (_, te) = Supervised.split(truthPairs.map(_._1))
    assert(qids == te.toSet)
  }
  test("method masks differ") {
    assert(Supervised.Rank.mask.length > Supervised.Ditto.mask.length)
    assert(Supervised.Tapas.mask.contains(4)) // numeric overlap
    assert(!Supervised.Ditto.mask.contains(3)) // no pretrained cosine
  }

  // ---- EmbedBaselines ----------------------------------------------------

  test("S-BE stand-in ranks by pretrained similarity and is OOV-blind") {
    val w = new World(11)
    // queries/cands made of generic words the pretrained model knows
    val a = TextCorpus("qs", Seq(("q1", "gen1 gen2 gen3")).toDF("docId", "text"))
    val b = TextCorpus("cs", Seq(
      ("good", "gen1 gen2 gen3"), ("bad", "dirl7 actl9 aud3")).toDF("docId", "text"))
    val out = EmbedBaselines.sbe(spark, w, a, b, k = 2)
    val first = out.ranked.where(col("rank") === 1).head()
    assert(first.getString(1) == "good")
    val oov = out.ranked.where(col("candId") === "bad").head().getDouble(2)
    assert(oov == 0.0) // all-OOV candidate gets zero vector
  }
  test("trained W2VEC baseline ranks paraphrase above noise") {
    val a = TextCorpus("qs", Seq(("q1", "alpha beta gamma")).toDF("docId", "text"))
    val b = TextCorpus("cs", Seq(
      ("good", "alpha beta gamma"), ("bad", "delta epsilon zeta")).toDF("docId", "text"))
    val out = EmbedBaselines.trained(spark, a, b, k = 2, docIdToken = false, dim = 12)
    assert(out.ranked.where(col("rank") === 1).head().getString(1) == "good")
  }
  test("D2VEC variant learns document-id vectors") {
    val a = TextCorpus("qs", Seq(("q1", "alpha beta gamma"), ("q2", "delta epsilon zeta")).toDF("docId", "text"))
    val b = TextCorpus("cs", Seq(
      ("c1", "alpha beta gamma"), ("c2", "delta epsilon zeta")).toDF("docId", "text"))
    val out = EmbedBaselines.trained(spark, a, b, k = 2, docIdToken = true, dim = 12)
    assert(out.ranked.count() == 4)
    assert(out.trainSec >= 0 && out.testSec >= 0)
  }

  // ---- MultiLabel --------------------------------------------------------

  test("multi-label centroid classifier recovers concept of held-out docs") {
    import repro.core.TaxonomyCorpus
    val tax = TaxonomyCorpus("tax", Seq(
      ("c0", "rootword", null.asInstanceOf[String]),
      ("c1", "finance report", "c0"),
      ("c2", "safety rules", "c0")).toDF("docId", "text", "parent"))
    val docs = TextCorpus("docs", (0 until 12).map { i =>
      if (i % 2 == 0) (s"d$i", s"finance report money d$i") else (s"d$i", s"safety rules helmet d$i")
    }.toDF("docId", "text"))
    val truthPairs = (0 until 12).map(i => (s"d$i", if (i % 2 == 0) "c1" else "c2"))
    val out = MultiLabel.run(spark, docs, tax, truthPairs, k = 1)
    val top1 = out.ranked.where(col("rank") === 1).collect()
      .map(r => (r.getString(0), r.getString(1)))
    val correct = top1.count { case (d, c) =>
      val i = d.drop(1).toInt; c == (if (i % 2 == 0) "c1" else "c2")
    }
    assert(correct >= top1.length - 1, top1.mkString(","))
  }
}
