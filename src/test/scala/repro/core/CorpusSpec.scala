package repro.core

import repro.{Oracle, SparkSpec}

class CorpusSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private lazy val table = {
    import spark.implicits._
    Seq(
      ("1", "sixth sense", "shyamalan", "thriller"),
      ("2", "pulp fiction", "tarantino", "drama"))
      .toDF("docId", "title", "director", "genre")
  }
  private lazy val tc = TableCorpus("movies", table, "docId")

  private lazy val texts = {
    import spark.implicits._
    Seq(
      ("p1", "a bland film by willis. a comedy after all"),
      ("p2", "willis asks; rated pg13"))
      .toDF("docId", "text")
  }
  private lazy val pc = TextCorpus("reviews", texts)

  test("table corpus: one unit per non-null cell") {
    assert(tc.units.count() == 6) // 2 rows × 3 non-id attrs
  }
  test("table corpus: unit rows match DuckDB unpivot") {
    val units = tc.units.select("docId", "unit", "attr")
    Oracle.assertEquivalent(
      units,
      """SELECT docId, title AS unit, 'title' AS attr FROM movies
         UNION ALL SELECT docId, director, 'director' FROM movies
         UNION ALL SELECT docId, genre, 'genre' FROM movies""",
      "movies" -> table)
  }
  test("table corpus units carry attr names") {
    val attrs = tc.units.select("attr").distinct().collect().map(_.getString(0)).toSet
    assert(attrs == Set("title", "director", "genre"))
  }
  test("table corpus skips null and empty cells") {
    import spark.implicits._
    val t = Seq(("1", null.asInstanceOf[String], "x"), ("2", " ", "y")).toDF("docId", "a", "b")
    assert(TableCorpus("t", t, "docId").units.count() == 2)
  }
  test("table corpus isTable") { assert(tc.isTable && !pc.isTable) }

  test("text corpus: sentence splitting") {
    val u = pc.units.where(col("docId") === "p1").collect().map(_.getString(1))
    assert(u.toSet == Set("a bland film by willis", "a comedy after all"))
  }
  test("text corpus: attr is null") {
    assert(pc.units.where(col("attr").isNotNull).count() == 0)
  }
  test("text corpus: semicolon splits sentences") {
    assert(pc.units.where(col("docId") === "p2").count() == 2)
  }

  test("docTerms distinct per doc") {
    val dt = pc.docTerms(spark, 1)
    val dup = dt.groupBy("docId", "term").count().where(col("count") > 1)
    assert(dup.count() == 0)
  }
  test("docTerms includes bigrams at maxN=2 within sentences only") {
    val dt = pc.docTerms(spark, 2).where(col("docId") === "p1")
    val terms = dt.select("term").collect().map(_.getString(0)).toSet
    assert(terms.contains("bland_film"))
    // "willis" ends sentence 1, "comedy" starts (after stop-word removal)
    // sentence 2 — no cross-sentence bigram:
    assert(!terms.exists(t => t.startsWith("willi_comedi")))
  }
  test("docTerms of table uses cell values as units") {
    val dt = tc.docTerms(spark, 2)
    val terms = dt.select("term").collect().map(_.getString(0)).toSet
    assert(terms.contains("sixth_sens"))
    assert(!terms.contains("sens_shyamalan")) // no cross-cell n-grams
  }
  test("distinctTokenCount counts stemmed unigrams") {
    // movies table tokens: sixth, sens, pulp, fiction, shyamalan,
    // tarantino, thriller, drama
    assert(tc.distinctTokenCount(spark) == 8)
  }
  test("taxonomy corpus: hierarchy edges") {
    import spark.implicits._
    val df = Seq(("c0", "root", null.asInstanceOf[String]), ("c1", "child one", "c0"),
      ("c2", "child two", "c0")).toDF("docId", "text", "parent")
    val tax = TaxonomyCorpus("t", df)
    assert(tax.hierarchy(spark).count() == 2)
    assert(tax.units.count() == 3)
  }
  test("plain corpora have empty hierarchy") {
    assert(tc.hierarchy(spark).count() == 0)
    assert(pc.hierarchy(spark).count() == 0)
  }
}
