package repro.metrics

import org.scalatest.funsuite.AnyFunSuite

class TaxoMetricsSpec extends AnyFunSuite {

  // ---- nodeScore (Eq. 1) -------------------------------------------------

  test("paper example: r1=a→b→c→d vs r2=a→b→c gives 0.5") {
    assert(TaxoMetrics.nodeScore(Seq("a", "b", "c", "d"), Seq("a", "b", "c")) == 0.5)
  }
  test("nodeScore identical paths is 1") {
    assert(TaxoMetrics.nodeScore(Seq("a", "b", "c", "d"), Seq("a", "b", "c", "d")) == 1.0)
  }
  test("nodeScore disjoint tails is 0") {
    assert(TaxoMetrics.nodeScore(Seq("a", "b", "c"), Seq("a", "b", "z")) == 0.0)
  }
  test("nodeScore excludes two most general levels") {
    // only the tails (after a,b) matter
    assert(TaxoMetrics.nodeScore(Seq("x", "y", "c"), Seq("p", "q", "c")) == 1.0)
  }
  test("nodeScore both paths of length ≤2: equality check") {
    assert(TaxoMetrics.nodeScore(Seq("a", "b"), Seq("a", "b")) == 1.0)
    assert(TaxoMetrics.nodeScore(Seq("a", "b"), Seq("a", "z")) == 0.0)
  }
  test("nodeScore is symmetric") {
    val p1 = Seq("a", "b", "c", "d"); val p2 = Seq("a", "b", "c", "e", "f")
    assert(TaxoMetrics.nodeScore(p1, p2) == TaxoMetrics.nodeScore(p2, p1))
  }
  test("nodeScore bounded in [0,1]") {
    val p1 = Seq("a", "b", "c", "d", "e"); val p2 = Seq("a", "b", "x")
    val s = TaxoMetrics.nodeScore(p1, p2)
    assert(s >= 0.0 && s <= 1.0)
  }

  // ---- exact PRF ---------------------------------------------------------

  private val gold = Map(
    "d1" -> Seq(Seq("r", "l1", "c1"), Seq("r", "l1", "c2")),
    "d2" -> Seq(Seq("r", "l1", "c3")))

  test("exact: perfect predictions give P=R=F=1") {
    val prf = TaxoMetrics.exact(gold, gold)
    assert(prf.p == 1.0 && prf.r == 1.0 && prf.f == 1.0)
  }
  test("exact: half-right predictions") {
    val pred = Map(
      "d1" -> Seq(Seq("r", "l1", "c1"), Seq("r", "l1", "zz")),
      "d2" -> Seq(Seq("r", "l1", "c3")))
    val prf = TaxoMetrics.exact(pred, gold)
    assert(math.abs(prf.p - 2.0 / 3) < 1e-9)
    assert(math.abs(prf.r - 2.0 / 3) < 1e-9)
  }
  test("exact: more predictions lowers precision, raises recall") {
    val narrow = Map("d1" -> Seq(Seq("r", "l1", "c1")), "d2" -> Seq.empty[Seq[String]])
    val wide = Map(
      "d1" -> Seq(Seq("r", "l1", "c1"), Seq("r", "l1", "c2"), Seq("r", "x", "y")),
      "d2" -> Seq(Seq("r", "l1", "c3"), Seq("r", "x", "z")))
    val pn = TaxoMetrics.exact(narrow, gold)
    val pw = TaxoMetrics.exact(wide, gold)
    assert(pw.r > pn.r && pw.p < pn.p)
  }
  test("exact: empty predictions give zero") {
    val prf = TaxoMetrics.exact(Map.empty, gold)
    assert(prf.p == 0.0 && prf.r == 0.0 && prf.f == 0.0)
  }

  // ---- node PRF ----------------------------------------------------------

  test("node: partial path overlap credits fractions") {
    val pred = Map("d2" -> Seq(Seq("r", "l1", "c3", "deep")))
    val prf = TaxoMetrics.node(pred, Map("d2" -> Seq(Seq("r", "l1", "c3"))))
    // Node(pred, gold) = |{c3}| / max(2,1) = .5
    assert(prf.p == 0.5 && prf.r == 0.5)
  }
  test("node >= exact always") {
    val pred = Map(
      "d1" -> Seq(Seq("r", "l1", "c1"), Seq("r", "l1", "zz")),
      "d2" -> Seq(Seq("r", "l1", "c3", "x")))
    val e = TaxoMetrics.exact(pred, gold)
    val n = TaxoMetrics.node(pred, gold)
    assert(n.p >= e.p && n.r >= e.r)
  }
  test("node picks best-matching gold path") {
    val pred = Map("d1" -> Seq(Seq("r", "l1", "c2")))
    val prf = TaxoMetrics.node(pred, gold)
    assert(prf.p == 1.0) // matches the second gold path exactly
  }

  // ---- paths -------------------------------------------------------------

  test("paths builds root-to-node text sequences") {
    val parent = Map("c1" -> "r", "c2" -> "c1")
    val texts = Map("r" -> "root", "c1" -> "mid", "c2" -> "leaf")
    val p = TaxoMetrics.paths(parent, texts)
    assert(p("c2") == Seq("root", "mid", "leaf"))
    assert(p("r") == Seq("root"))
  }
  test("paths tolerates cycles") {
    val parent = Map("a" -> "b", "b" -> "a")
    val texts = Map("a" -> "ta", "b" -> "tb")
    val p = TaxoMetrics.paths(parent, texts)
    assert(p.contains("a") && p("a").nonEmpty)
  }
}
