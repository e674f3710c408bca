package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.Corpus

/** L-BE* stand-in (paper §V-B): a supervised multi-label classifier over
  * taxonomy concepts, trained on 60% of the annotated documents.
  *
  * Implemented as a nearest-centroid classifier in tf-idf space — for
  * each concept, the centroid of its training documents' tf-idf vectors;
  * concepts without training documents back off to the tf-idf vector of
  * their own taxonomy text. A held-out document is scored against every
  * concept and the top-k concepts are returned. This mirrors the
  * published pattern: strong for documents annotated with one concept
  * (plenty of centroids), weaker for the long multi-concept tail.
  */
object MultiLabel {

  final case class Ranked(ranked: DataFrame, trainSec: Double, testSec: Double)

  def run(
      spark: SparkSession,
      docs: Corpus,        // queries (documents)
      taxonomy: Corpus,    // candidates (concepts)
      truthPairs: Seq[(String, String)],
      k: Int): Ranked = {
    import spark.implicits._
    val t0 = System.nanoTime()
    val dTok = DocTokens.map(spark, docs, markers = false)
    val cTok = DocTokens.map(spark, taxonomy, markers = false)
    val idfMap = Supervised.idf(dTok.values ++ cTok.values)

    val truthByQ = truthPairs.groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    val (trainQ, testQ) = Supervised.split(truthByQ.keys.toSeq)

    def tfidf(tokens: Seq[String]) = Supervised.tfidfVec(tokens, idfMap)

    // Concept centroids from training docs; backoff to the concept text.
    val byConcept = trainQ.flatMap(q => truthByQ(q).map(c => c -> q))
      .groupBy(_._1).view.mapValues(_.map(_._2)).toMap
    val centroids: Map[String, Map[String, Double]] = cTok.map { case (cid, ctoks) =>
      byConcept.get(cid) match {
        case Some(ds) if ds.nonEmpty =>
          val vecs = ds.map(d => tfidf(dTok(d)))
          val sum = scala.collection.mutable.Map.empty[String, Double].withDefaultValue(0.0)
          vecs.foreach(_.foreach { case (t, v) => sum(t) += v })
          cid -> sum.view.mapValues(_ / ds.size).toMap
        case _ => cid -> tfidf(ctoks)
      }
    }
    val trainSec = (System.nanoTime() - t0) / 1e9

    val t1 = System.nanoTime()
    def cos(a: Map[String, Double], b: Map[String, Double]): Double = {
      if (a.isEmpty || b.isEmpty) return 0.0
      var dot = 0.0
      val (s, l) = if (a.size < b.size) (a, b) else (b, a)
      s.foreach { case (t, v) => l.get(t).foreach(w => dot += v * w) }
      val na = math.sqrt(a.values.map(v => v * v).sum)
      val nb = math.sqrt(b.values.map(v => v * v).sum)
      if (na == 0 || nb == 0) 0.0 else dot / (na * nb)
    }
    val rows = testQ.flatMap { q =>
      val dv = tfidf(dTok(q))
      centroids.toSeq
        .map { case (cid, cv) => (cid, cos(dv, cv)) }
        .sortBy { case (c, s) => (-s, c) }
        .take(k)
        .zipWithIndex
        .map { case ((c, s), i) => (q, c, s, i + 1) }
    }
    val ranked = rows.toIndexedSeq.toDF("queryId", "candId", "sim", "rank")
    val testSec = (System.nanoTime() - t1) / 1e9
    Ranked(ranked, trainSec, testSec)
  }
}
