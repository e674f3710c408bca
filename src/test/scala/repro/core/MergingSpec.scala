package repro.core

import repro.SparkSpec

class MergingSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  // ---- FD rule -----------------------------------------------------------

  test("fdBinWidth on uniform 1..100") {
    val w = Merging.fdBinWidth((1 to 100).map(_.toDouble))
    // IQR ≈ 49.5, n^(1/3) ≈ 4.64 → width ≈ 21.3
    assert(w > 15 && w < 30)
  }
  test("fdBinWidth degenerate: constant values") {
    assert(Merging.fdBinWidth(Seq(5.0, 5.0, 5.0)) == 0.0)
  }
  test("fdBinWidth degenerate: single value") {
    assert(Merging.fdBinWidth(Seq(5.0)) == 0.0)
  }
  test("fdBinWidth is scale-equivariant") {
    val a = (1 to 50).map(_.toDouble)
    val w1 = Merging.fdBinWidth(a)
    val w2 = Merging.fdBinWidth(a.map(_ * 10))
    assert(math.abs(w2 - 10 * w1) < 1e-9)
  }

  // ---- numeric bucketing -------------------------------------------------

  test("numericBucketMap merges close numbers into the same bucket") {
    import spark.implicits._
    val terms = ((100 to 110).map(_.toString) ++ Seq("5000", "movie")).toDF("term")
    val m = Merging.numericBucketMap(spark, terms).collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    assert(m("100") == m("101"))
    assert(m("100") != m("5000"))
    assert(!m.contains("movie"))
  }
  test("numericBucketMap empty for non-numeric corpora") {
    import spark.implicits._
    val terms = Seq("a", "b").toDF("term")
    assert(Merging.numericBucketMap(spark, terms).count() == 0)
  }
  test("numericBucketMap bucket labels are num<i>") {
    import spark.implicits._
    val terms = Seq("1", "2", "3", "50", "100").toDF("term")
    val canons = Merging.numericBucketMap(spark, terms).select("canon")
      .collect().map(_.getString(0))
    assert(canons.forall(_.matches("num<\\d+>")))
  }

  // ---- dictionary merging ------------------------------------------------

  test("dictionaryMap normalizes entries through the text pipeline") {
    val m = Merging.dictionaryMap(spark, Seq(("B. Willis", "Bruce Willis")))
      .collect().map(r => (r.getString(0), r.getString(1)))
    assert(m.toSeq == Seq(("b_willi", "bruce_willi")))
  }
  test("dictionaryMap drops identity pairs") {
    assert(Merging.dictionaryMap(spark, Seq(("plan", "plans"))).count() == 0) // both stem to plan
  }
  test("dictionaryMap acronym expansion") {
    val m = Merging.dictionaryMap(spark, Seq(("pdca", "plan do check act")))
      .collect().map(r => (r.getString(0), r.getString(1)))
    assert(m.head._1 == "pdca" && m.head._2.startsWith("plan_"))
  }
  test("dictionaryMap dedups") {
    assert(Merging.dictionaryMap(spark, Seq(("a1x", "b1x"), ("a1x", "b1x"))).count() == 1)
  }

  // ---- gamma merge -------------------------------------------------------

  private def vecs: Map[String, Array[Float]] = Map(
    "alpha" -> Array(1f, 0f, 0f),
    "alpha2" -> Array(0.99f, 0.1f, 0f),
    "beta" -> Array(0f, 1f, 0f),
    "gamma" -> Array(0f, 0f, 1f))

  test("gammaMergeMap merges terms above threshold") {
    import spark.implicits._
    val terms = Seq("alpha", "alpha2", "beta", "gamma").toDF("term")
    val m = Merging.gammaMergeMap(spark, terms, vecs, 0.9)
      .collect().map(r => (r.getString(0), r.getString(1))).toMap
    assert(m == Map("alpha2" -> "alpha"))
  }
  test("gammaMergeMap leaves dissimilar terms alone") {
    import spark.implicits._
    val terms = Seq("beta", "gamma").toDF("term")
    assert(Merging.gammaMergeMap(spark, terms, vecs, 0.5).count() == 0)
  }
  test("gammaMergeMap ignores out-of-vocabulary terms") {
    import spark.implicits._
    val terms = Seq("unknown1", "unknown2").toDF("term")
    assert(Merging.gammaMergeMap(spark, terms, vecs, 0.1).count() == 0)
  }
  test("gammaMergeMap transitive closure picks smallest representative") {
    import spark.implicits._
    val chain = Map(
      "a" -> Array(1f, 0f), "b" -> Array(0.98f, 0.2f), "c" -> Array(0.93f, 0.37f))
    val terms = Seq("a", "b", "c").toDF("term")
    val m = Merging.gammaMergeMap(spark, terms, chain, 0.97)
      .collect().map(r => (r.getString(0), r.getString(1))).toMap
    // a~b and b~c merge; a~c is below γ but joins via union-find
    assert(m("b") == "a" && m("c") == "a")
  }

  // ---- compose -----------------------------------------------------------

  test("compose resolves chained mappings") {
    import spark.implicits._
    val m1 = Seq(("x", "y")).toDF("variant", "canon")
    val m2 = Seq(("y", "z")).toDF("variant", "canon")
    val m = Merging.compose(spark, m1, m2).collect()
      .map(r => (r.getString(0), r.getString(1))).toMap
    assert(m == Map("x" -> "z", "y" -> "z"))
  }
  test("compose tolerates cycles") {
    import spark.implicits._
    val m1 = Seq(("x", "y"), ("y", "x")).toDF("variant", "canon")
    val m = Merging.compose(spark, m1).collect().map(r => (r.getString(0), r.getString(1))).toMap
    // resolution stops at the cycle; mapping stays functional
    assert(m.keys.toSet.subsetOf(Set("x", "y")))
  }
  test("compose of empty is empty") {
    import spark.implicits._
    val empty = Seq.empty[(String, String)].toDF("variant", "canon")
    assert(Merging.compose(spark, empty).count() == 0)
  }

  // ---- gamma calibration -------------------------------------------------

  test("Gamma.calibrate averages synonym cosines") {
    val v = Map("a" -> Array(1f, 0f), "b" -> Array(1f, 0f), "c" -> Array(0f, 1f))
    val g = Gamma.calibrate(Seq(("a", "b"), ("a", "c")), v)
    assert(math.abs(g - 0.5) < 1e-6)
  }
  test("Gamma.calibrate default when no coverage") {
    assert(Gamma.calibrate(Seq(("x", "y")), Map.empty) == 0.57)
  }
  test("Gamma.calibrate skips partially covered pairs") {
    val v = Map("a" -> Array(1f, 0f), "b" -> Array(1f, 0f))
    assert(Gamma.calibrate(Seq(("a", "b"), ("a", "zz")), v) == 1.0)
  }
}
