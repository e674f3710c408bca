package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Uniform corpus model (paper §II).
  *
  * A corpus is one of:
  *  - a relational **table**: each tuple is a document; attributes become
  *    extra metadata nodes;
  *  - **structured text** (taxonomy): each node is a document with an
  *    optional parent, giving metadata–metadata edges;
  *  - plain **text**: each sentence/paragraph is a document.
  *
  * Internally every corpus is a DataFrame of text *units*:
  * `(docId: String, unit: String, attr: String|null)` — one row per cell
  * value (tables) or per sentence (texts). n-gram terms are built within a
  * unit, matching the paper's term construction.
  */
sealed trait Corpus {
  def name: String

  /** `(docId, unit, attr)` — attr is null for non-table corpora. */
  def units: DataFrame

  /** `(child, parent)` doc-id pairs for structured text; empty otherwise. */
  def hierarchy(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq.empty[(String, String)].toDF("child", "parent")
  }

  def isTable: Boolean = false

  /** `(docId, term)` pairs after preprocessing, distinct per document. */
  def docTerms(spark: SparkSession, maxN: Int): DataFrame = {
    val termsUdf = udf((s: String) => TextPrep.terms(s, maxN))
    units
      .select(col("docId"), col("attr"), explode(termsUdf(col("unit"))).as("term"))
      .select("docId", "attr", "term")
      .distinct()
  }

  /** Number of distinct unigram tokens — used to pick the first corpus in
    * graph creation (paper §II-B: the corpus with fewer distinct tokens
    * seeds the data nodes).
    */
  def distinctTokenCount(spark: SparkSession): Long = {
    val tokUdf = udf((s: String) => TextPrep.terms1(s))
    units.select(explode(tokUdf(col("unit"))).as("tok")).distinct().count()
  }
}

/** Relational table corpus: `df` must contain `idCol`; every other column
  * is an attribute whose cell values become text units.
  */
final case class TableCorpus(name: String, df: DataFrame, idCol: String) extends Corpus {
  override def isTable: Boolean = true

  override def units: DataFrame = {
    val attrs = df.columns.filterNot(_ == idCol)
    val unitCols = attrs.map { a =>
      struct(lit(a).as("attr"), col(a).cast("string").as("unit"))
    }
    df.select(col(idCol).cast("string").as("docId"), explode(array(unitCols.toIndexedSeq: _*)).as("u"))
      .select(col("docId"), col("u.unit").as("unit"), col("u.attr").as("attr"))
      .where(col("unit").isNotNull && length(trim(col("unit"))) > 0)
  }
}

/** Plain-text corpus: `df` has `(docId, text)`; sentences are split on
  * `.`, `!`, `?`, `;` and newlines so n-grams never cross sentences.
  */
final case class TextCorpus(name: String, df: DataFrame) extends Corpus {
  override def units: DataFrame = {
    val sentUdf = udf((s: String) =>
      if (s == null) Seq.empty[String]
      else s.split("[.!?;\n]+").toSeq.map(_.trim).filter(_.nonEmpty))
    df.select(col("docId").cast("string").as("docId"), explode(sentUdf(col("text"))).as("unit"))
      .withColumn("attr", lit(null).cast("string"))
  }
}

/** Structured-text corpus (taxonomy): `df` has `(docId, text, parent)`;
  * `parent` is the docId of the parent concept or null for roots.
  */
final case class TaxonomyCorpus(name: String, df: DataFrame) extends Corpus {
  override def units: DataFrame =
    df.select(
        col("docId").cast("string").as("docId"),
        col("text").as("unit"),
        lit(null).cast("string").as("attr"))
      .where(col("unit").isNotNull)

  override def hierarchy(spark: SparkSession): DataFrame =
    df.where(col("parent").isNotNull)
      .select(col("docId").cast("string").as("child"), col("parent").cast("string").as("parent"))
}
