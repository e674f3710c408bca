package repro.metrics

import repro.{Oracle, SparkSpec}

class RankMetricsSpec extends SparkSpec {
  import spark.implicits._

  /** q1: relevant at rank 2; q2: relevant at rank 1; q3: no relevant. */
  private lazy val ranked = Seq(
    ("q1", "a", 1), ("q1", "b", 2), ("q1", "c", 3),
    ("q2", "x", 1), ("q2", "y", 2),
    ("q3", "m", 1), ("q3", "n", 2))
    .toDF("queryId", "candId", "rank")
  private lazy val truth = Seq(
    ("q1", "b"), ("q2", "x"), ("q3", "zz"))
    .toDF("queryId", "candId")

  test("MRR hand-computed") {
    // (1/2 + 1/1 + 0) / 3 = 0.5
    assert(math.abs(RankMetrics.mrr(ranked, truth) - 0.5) < 1e-9)
  }
  test("MRR matches DuckDB computation") {
    val got = RankMetrics.mrr(ranked, truth)
    val conn = java.sql.DriverManager.getConnection("jdbc:duckdb:")
    try {
      // verify via Oracle on the intermediate first-hit table
      val firstHit = ranked.join(truth, Seq("queryId", "candId"))
        .groupBy("queryId")
        .agg(org.apache.spark.sql.functions.min($"rank").cast("string").as("firstRank"))
      Oracle.assertEquivalent(firstHit,
        """SELECT r.queryId, CAST(MIN(CAST(r.rank AS INT)) AS VARCHAR) AS firstRank
           FROM ranked r JOIN truth t ON r.queryId = t.queryId AND r.candId = t.candId
           GROUP BY r.queryId""",
        "ranked" -> ranked.selectExpr("queryId", "candId", "CAST(rank AS STRING) AS rank"),
        "truth" -> truth)
    } finally conn.close()
    assert(math.abs(got - 0.5) < 1e-9)
  }
  test("MRR is 1 when every query hits at rank 1") {
    val r = Seq(("q", "a", 1)).toDF("queryId", "candId", "rank")
    val t = Seq(("q", "a")).toDF("queryId", "candId")
    assert(RankMetrics.mrr(r, t) == 1.0)
  }
  test("MRR counts queries missing from ranking as 0") {
    val r = Seq(("q1", "a", 1)).toDF("queryId", "candId", "rank")
    val t = Seq(("q1", "a"), ("q9", "b")).toDF("queryId", "candId")
    assert(math.abs(RankMetrics.mrr(r, t) - 0.5) < 1e-9)
  }

  test("MAP@1 equals precision at 1") {
    // q1: no hit at 1 → 0; q2: hit → 1; q3: 0 → mean = 1/3
    assert(math.abs(RankMetrics.mapAtK(ranked, truth, 1) - 1.0 / 3) < 1e-9)
  }
  test("MAP@5 hand-computed") {
    // q1: AP = (1/2)/1 = .5 ; q2: 1 ; q3: 0 → mean = .5
    assert(math.abs(RankMetrics.mapAtK(ranked, truth, 5) - 0.5) < 1e-9)
  }
  test("MAP with multiple relevant docs") {
    val r = Seq(("q", "a", 1), ("q", "b", 2), ("q", "c", 3)).toDF("queryId", "candId", "rank")
    val t = Seq(("q", "a"), ("q", "c")).toDF("queryId", "candId")
    // AP@5 = (1/1 + 2/3)/2 = 5/6
    assert(math.abs(RankMetrics.mapAtK(r, t, 5) - 5.0 / 6) < 1e-9)
  }
  test("MAP@k denominator truncates at k") {
    val r = Seq(("q", "a", 1)).toDF("queryId", "candId", "rank")
    val t = Seq(("q", "a"), ("q", "b"), ("q", "c")).toDF("queryId", "candId")
    // min(|R|,1) = 1 → AP@1 = 1
    assert(RankMetrics.mapAtK(r, t, 1) == 1.0)
  }

  test("HasPositive@1") {
    assert(math.abs(RankMetrics.hasPositiveAtK(ranked, truth, 1) - 1.0 / 3) < 1e-9)
  }
  test("HasPositive@5") {
    // q1 and q2 have a hit within 5 → 2/3
    assert(math.abs(RankMetrics.hasPositiveAtK(ranked, truth, 5) - 2.0 / 3) < 1e-9)
  }
  test("HasPositive counts a query once despite multiple hits") {
    val r = Seq(("q", "a", 1), ("q", "b", 2)).toDF("queryId", "candId", "rank")
    val t = Seq(("q", "a"), ("q", "b")).toDF("queryId", "candId")
    assert(RankMetrics.hasPositiveAtK(r, t, 5) == 1.0)
  }
  test("HasPositive@k matches DuckDB") {
    val k = 5
    val hitDf = ranked.where($"rank" <= k).join(truth, Seq("queryId", "candId"))
      .select("queryId").distinct()
    Oracle.assertEquivalent(hitDf,
      s"""SELECT DISTINCT r.queryId
          FROM ranked r JOIN truth t ON r.queryId = t.queryId AND r.candId = t.candId
          WHERE CAST(r.rank AS INT) <= $k""",
      "ranked" -> ranked.selectExpr("queryId", "candId", "CAST(rank AS STRING) AS rank"),
      "truth" -> truth)
  }

  test("row computes all seven measures coherently") {
    val row = RankMetrics.row(ranked, truth)
    assert(row.mrr == 0.5 && row.map1 == 1.0 / 3 && row.hp5 == 2.0 / 3)
    assert(row.map5 == row.map20) // no extra hits past rank 5
    assert(row.hp20 == row.hp5)
  }
  test("empty truth yields NaN-free zeros for empty query set") {
    val r = Seq(("q", "a", 1)).toDF("queryId", "candId", "rank")
    val t = Seq.empty[(String, String)].toDF("queryId", "candId")
    // no queries → avg over empty set; guard: returns null→NaN? Expect 0 rows;
    // metric functions are only called with non-empty truth in practice, so
    // assert the call does not throw and yields a non-positive result or NaN.
    val v = RankMetrics.mrr(r, t)
    assert(v.isNaN || v == 0.0)
  }
}
