package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

class TextPrepSpec extends AnyFunSuite {

  /** Sample-based property check (scalatestplus bridge is unavailable
    * offline, so we drive scalacheck generators by hand).
    */
  private def forAll[A](gen: Gen[A], n: Int = 60)(f: A => Unit): Unit =
    (0 until n).foreach { i => gen.apply(Gen.Parameters.default, org.scalacheck.rng.Seed(i.toLong)).foreach(f) }

  // ---- tokenize ----------------------------------------------------------

  test("tokenize lowercases") { assert(TextPrep.tokenize("Hello World") == Seq("hello", "world")) }
  test("tokenize splits on punctuation") {
    assert(TextPrep.tokenize("a,b;c:d!e") == Seq("a", "b", "c", "d", "e"))
  }
  test("tokenize keeps decimal numbers whole") {
    assert(TextPrep.tokenize("rated 7.5 stars") == Seq("rated", "7.5", "stars"))
  }
  test("tokenize splits trailing dot from number") {
    assert(TextPrep.tokenize("ends 42.") == Seq("ends", "42"))
  }
  test("tokenize handles abbreviation dots") {
    assert(TextPrep.tokenize("B. Willis") == Seq("b", "willis"))
  }
  test("tokenize of null is empty") { assert(TextPrep.tokenize(null).isEmpty) }
  test("tokenize of empty string is empty") { assert(TextPrep.tokenize("").isEmpty) }
  test("tokenize keeps digits inside words") {
    assert(TextPrep.tokenize("covid19 cases") == Seq("covid19", "cases"))
  }
  test("tokenize drops unicode punctuation between words") {
    assert(TextPrep.tokenize("a—b") == Seq("a", "b"))
  }
  test("tokenize never yields empty tokens (property)") {
    forAll(Gen.asciiPrintableStr) { s => assert(TextPrep.tokenize(s).forall(_.nonEmpty)) }
  }
  test("tokenize output is lowercase (property)") {
    forAll(Gen.alphaStr) { s => assert(TextPrep.tokenize(s).forall(t => t == t.toLowerCase)) }
  }

  // ---- isNumeric ---------------------------------------------------------

  test("isNumeric accepts integers") { assert(TextPrep.isNumeric("123")) }
  test("isNumeric accepts decimals") { assert(TextPrep.isNumeric("1.5")) }
  test("isNumeric rejects words") { assert(!TextPrep.isNumeric("abc")) }
  test("isNumeric rejects mixed") { assert(!TextPrep.isNumeric("a1")) }
  test("isNumeric rejects double dots") { assert(!TextPrep.isNumeric("1.2.3")) }
  test("isNumeric rejects lone dot") { assert(!TextPrep.isNumeric(".")) }
  test("isNumeric rejects empty") { assert(!TextPrep.isNumeric("")) }

  // ---- Porter stemmer ----------------------------------------------------

  test("stem plural s") { assert(TextPrep.stem("cats") == "cat") }
  test("stem sses") { assert(TextPrep.stem("caresses") == "caress") }
  test("stem ies") { assert(TextPrep.stem("ponies") == "poni") }
  test("stem ss unchanged") { assert(TextPrep.stem("caress") == "caress") }
  test("stem ing with vowel stem") { assert(TextPrep.stem("hopping") == "hop") }
  test("stem planning to plan (paper example)") { assert(TextPrep.stem("planning") == "plan") }
  test("stem plans to plan (paper example)") { assert(TextPrep.stem("plans") == "plan") }
  test("stem agreed") { assert(TextPrep.stem("agreed") == "agre") }
  test("stem conflated") { assert(TextPrep.stem("conflated") == "conflat") }
  test("stem troubled") { assert(TextPrep.stem("troubled") == "troubl") }
  test("stem sized") { assert(TextPrep.stem("sized") == "size") }
  test("stem falling") { assert(TextPrep.stem("falling") == "fall") }
  test("stem filing") { assert(TextPrep.stem("filing") == "file") }
  test("stem happy y->i") { assert(TextPrep.stem("happy") == "happi") }
  test("stem relational") { assert(TextPrep.stem("relational") == "relat") }
  test("stem conditional") { assert(TextPrep.stem("conditional") == "condit") }
  test("stem digitizer") { assert(TextPrep.stem("digitizer") == "digit") }
  test("stem hopefulness") { assert(TextPrep.stem("hopefulness") == "hope") }
  test("stem formality") { assert(TextPrep.stem("formaliti") == "formal") }
  test("stem revival") { assert(TextPrep.stem("revival") == "reviv") }
  test("stem adjustment") { assert(TextPrep.stem("adjustment") == "adjust") }
  test("stem adoption (ion rule)") { assert(TextPrep.stem("adoption") == "adopt") }
  test("stem numbers unchanged") { assert(TextPrep.stem("1234") == "1234") }
  test("stem short words unchanged") { assert(TextPrep.stem("ab") == "ab") }
  test("stem probate keeps e (m=1 cvc)") { assert(TextPrep.stem("rate") == "rate") }
  test("stem cease") { assert(TextPrep.stem("cease") == "ceas") }
  test("stem controll double l") { assert(TextPrep.stem("controlling") == "control") }
  test("stem is idempotent on its own output for common words") {
    Seq("running", "audits", "matching", "processes", "documents").foreach { w =>
      val s1 = TextPrep.stem(w)
      assert(TextPrep.stem(s1) == TextPrep.stem(s1), s"for $w")
    }
  }
  test("stem same word same result (determinism, property)") {
    forAll(Gen.alphaLowerStr.suchThat(_.length >= 3)) { w =>
      assert(TextPrep.stem(w) == TextPrep.stem(w))
    }
  }
  test("stem never empties a word (property)") {
    forAll(Gen.alphaLowerStr.suchThat(_.nonEmpty)) { w => assert(TextPrep.stem(w).nonEmpty) }
  }

  // ---- terms / n-grams ---------------------------------------------------

  test("terms1 removes stop-words") {
    assert(TextPrep.terms1("the cat and the hat") == Seq("cat", "hat"))
  }
  test("terms1 stems") {
    assert(TextPrep.terms1("running dogs") == Seq("run", "dog"))
  }
  test("terms n=1 equals terms1 distinct") {
    assert(TextPrep.terms("big cats big", 1) == Seq("big", "cat"))
  }
  test("terms n=3 for three-token span yields expected 5 nodes (paper §II-D)") {
    // "the sixth sense" → stop-word 'the' removed → sixth, sense
    // with a 3-token input: use one without stop-words
    val t = TextPrep.terms("sixth sense movie", 3)
    assert(t.toSet == Set("sixth", "sens", "movi", "sixth_sens", "sens_movi", "sixth_sens_movi"))
  }
  test("terms dedups repeated n-grams") {
    val t = TextPrep.terms("cat cat cat", 2)
    assert(t == Seq("cat", "cat_cat"))
  }
  test("terms with maxN larger than tokens") {
    assert(TextPrep.terms("cat", 3) == Seq("cat"))
  }
  test("terms empty input") { assert(TextPrep.terms("", 3).isEmpty) }
  test("terms only stop-words") { assert(TextPrep.terms("the and of", 2).isEmpty) }
  test("terms count grows with n (property)") {
    forAll(Gen.listOfN(6, Gen.oneOf("alpha", "beta", "gamma", "delta"))) { ws =>
      val text = ws.mkString(" ")
      assert(TextPrep.terms(text, 2).size >= TextPrep.terms(text, 1).size)
      assert(TextPrep.terms(text, 3).size >= TextPrep.terms(text, 2).size)
    }
  }
  test("stop-word list is lowercase") {
    assert(TextPrep.StopWords.forall(w => w == w.toLowerCase))
  }
}
