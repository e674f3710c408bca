package repro.embed

import repro.SparkSpec

class EmbeddingsSpec extends SparkSpec {

  private def corpus(n: Int = 300): Seq[Array[String]] = {
    val r = new scala.util.Random(5)
    (0 until n).map { _ =>
      // "apple" and "apfel" share contexts; "rock" lives elsewhere.
      if (r.nextBoolean()) Array("fruit", if (r.nextBoolean()) "apple" else "apfel", "sweet", "tree")
      else Array("stone", "rock", "hard", "mountain")
    }
  }

  private lazy val vectors: Map[String, Array[Float]] = {
    import spark.implicits._
    val df = spark.createDataset(corpus()).toDF("sentence")
    Embeddings.train(spark, df, Embeddings.Config(vectorSize = 16, window = 3, iterations = 3))
  }

  test("training covers the vocabulary (minCount=1)") {
    assert(Set("apple", "apfel", "rock", "fruit").subsetOf(vectors.keySet))
  }
  test("vectors have requested dimension") {
    assert(vectors("apple").length == 16)
  }
  test("co-occurring words are closer than unrelated ones") {
    val close = Embeddings.cosine(vectors("apple"), vectors("apfel"))
    val far = Embeddings.cosine(vectors("apple"), vectors("rock"))
    assert(close > far)
  }
  test("cosine of identical vectors is 1") {
    val v = Array(1f, 2f, 3f)
    assert(math.abs(Embeddings.cosine(v, v) - 1.0) < 1e-6)
  }
  test("cosine of orthogonal vectors is 0") {
    assert(Embeddings.cosine(Array(1f, 0f), Array(0f, 1f)) == 0.0)
  }
  test("cosine with zero vector is 0") {
    assert(Embeddings.cosine(Array(0f, 0f), Array(1f, 1f)) == 0.0)
  }
  test("meanVector averages present tokens") {
    val v = Map("a" -> Array(2f, 0f), "b" -> Array(0f, 2f))
    val m = Embeddings.meanVector(Seq("a", "b"), v, 2)
    assert(m.toSeq == Seq(1f, 1f))
  }
  test("meanVector skips OOV tokens") {
    val v = Map("a" -> Array(2f, 0f))
    assert(Embeddings.meanVector(Seq("a", "zz"), v, 2).toSeq == Seq(2f, 0f))
  }
  test("meanVector of all-OOV doc is zero") {
    assert(Embeddings.meanVector(Seq("x", "y"), Map.empty, 3).toSeq == Seq(0f, 0f, 0f))
  }
  test("training is deterministic in seed with one partition corpus") {
    import spark.implicits._
    val df = spark.createDataset(corpus(50)).toDF("sentence").coalesce(1)
    val cfg = Embeddings.Config(vectorSize = 8, window = 2, iterations = 1, seed = 3)
    val v1 = Embeddings.train(spark, df, cfg)
    val v2 = Embeddings.train(spark, df, cfg)
    assert(v1.keySet == v2.keySet)
  }
}
