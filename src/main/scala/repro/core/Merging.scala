package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Data-node merging techniques (paper §II-C).
  *
  * Each technique produces a `(variant, canon)` mapping DataFrame that
  * [[GraphBuilder]] applies to document terms before building nodes and
  * edges. Stemming-based merging is inherent in [[TextPrep.stem]].
  */
object Merging {

  /** Freedman–Diaconis bin width: `2 * IQR / n^(1/3)`; 0 when degenerate. */
  def fdBinWidth(values: Seq[Double]): Double = {
    if (values.size < 2) return 0.0
    val sorted = values.sorted
    def quantile(q: Double): Double = {
      val pos  = q * (sorted.size - 1)
      val lo   = pos.toInt
      val frac = pos - lo
      if (lo + 1 < sorted.size) sorted(lo) * (1 - frac) + sorted(lo + 1) * frac
      else sorted(lo)
    }
    val iqr = quantile(0.75) - quantile(0.25)
    2.0 * iqr / math.cbrt(sorted.size.toDouble)
  }

  /** Merge numeric terms into equal-width buckets, width per the FD rule
    * computed over the distinct numeric values observed across corpora.
    * Each numeric term maps to a bucket node `num⟨i⟩` where `i` is the
    * bucket index from the global minimum.
    *
    * `docTerms` DataFrames are only read for their `term` column.
    */
  def numericBucketMap(spark: SparkSession, termDfs: DataFrame*): DataFrame = {
    import spark.implicits._
    val isNum = udf((s: String) => TextPrep.isNumeric(s))
    val nums = termDfs
      .map(_.select(col("term")))
      .reduce(_ union _)
      .distinct()
      .where(isNum(col("term")))
      .as[String]
      .collect()
      .toSeq
    val vals = nums.map(_.toDouble)
    if (vals.size < 2) return Seq.empty[(String, String)].toDF("variant", "canon")
    val width = fdBinWidth(vals.distinct)
    if (width <= 0) return Seq.empty[(String, String)].toDF("variant", "canon")
    val lo = vals.min
    nums.map { t =>
      val idx = math.floor((t.toDouble - lo) / width).toLong
      (t, s"num<$idx>")
    }.toDF("variant", "canon")
  }

  /** Dictionary-based merging (synonyms, acronyms, typos from an external
    * lexical resource). Entries are preprocessed with the same pipeline as
    * corpus text so that variants meet graph terms in stemmed n-gram form.
    * Multi-token entries are rendered with `_` separators.
    */
  def dictionaryMap(spark: SparkSession, pairs: Seq[(String, String)]): DataFrame = {
    import spark.implicits._
    def norm(s: String): String = TextPrep.terms1(s).mkString("_")
    pairs
      .map { case (v, c) => (norm(v), norm(c)) }
      .filter { case (v, c) => v.nonEmpty && c.nonEmpty && v != c }
      .distinct
      .toDF("variant", "canon")
  }

  private def cosine(a: Array[Float], b: Array[Float]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0; var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }

  /** Embedding-similarity merging: merge term pairs whose cosine in a
    * pre-trained model exceeds γ (paper: Wikipedia2Vec, γ = 0.57 from a
    * WordNet synonym list — see [[Gamma.calibrate]]). Connected variants
    * collapse to the lexicographically smallest member via union-find.
    *
    * `vocabVectors` is the pre-trained model restricted to graph terms;
    * the all-pairs similarity is computed as a distributed self-join.
    */
  def gammaMergeMap(
      spark: SparkSession,
      terms: DataFrame,
      vocabVectors: Map[String, Array[Float]],
      gamma: Double): DataFrame = {
    import spark.implicits._
    val inVocab = terms.select("term").distinct().as[String].collect()
      .filter(vocabVectors.contains).sorted
    if (inVocab.length < 2) return Seq.empty[(String, String)].toDF("variant", "canon")

    val bc = spark.sparkContext.broadcast(vocabVectors.filter { case (k, _) => inVocab.contains(k) })
    val idx = spark.createDataset(inVocab.toIndexedSeq).toDF("t")
    val simPairs = idx.as("l").crossJoin(idx.as("r"))
      .where(col("l.t") < col("r.t"))
      .as[(String, String)]
      .filter { case (l, r) =>
        val m = bc.value
        cosine(m(l), m(r)) >= gamma
      }
      .collect()

    // Union-find over merged pairs; representative = smallest label.
    val parent = scala.collection.mutable.Map.empty[String, String]
    def find(x: String): String = {
      val p = parent.getOrElse(x, x)
      if (p == x) x else { val r = find(p); parent(x) = r; r }
    }
    def union(a: String, b: String): Unit = {
      val (ra, rb) = (find(a), find(b))
      if (ra != rb) { if (ra < rb) parent(rb) = ra else parent(ra) = rb }
    }
    simPairs.foreach { case (l, r) => union(l, r) }
    val mapping = parent.keys.toSeq.map(t => (t, find(t))).filter { case (v, c) => v != c }
    bc.destroy()
    mapping.toDF("variant", "canon")
  }

  /** Compose several merge maps, resolving chains (variant → mid → canon). */
  def compose(spark: SparkSession, maps: DataFrame*): DataFrame = {
    import spark.implicits._
    val all = maps.map(_.select("variant", "canon")).reduceOption(_ union _)
      .map(_.as[(String, String)].collect().toSeq)
      .getOrElse(Seq.empty)
    val m = scala.collection.mutable.Map(all: _*)
    def resolve(t: String, seen: Set[String]): String =
      m.get(t) match {
        case Some(c) if !seen(c) => resolve(c, seen + t)
        case _                   => t
      }
    m.keys.toSeq.map(v => (v, resolve(v, Set(v)))).filter { case (v, c) => v != c }
      .toDF("variant", "canon")
  }
}
