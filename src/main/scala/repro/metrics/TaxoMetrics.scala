package repro.metrics

/** Exact and Node scores for taxonomy matching (Table III, paper §V-B).
  *
  * A taxonomy path is the root-to-node sequence of concept *texts*. With
  * **Exact** scoring a predicted path counts only when it equals a
  * ground-truth path. The **Node** score credits partial overlap via
  * Eq. (1): after dropping the two most general levels of each path,
  * `Node(p1,p2) = |nodes(p1') ∩ nodes(p2')| / max(|p1'|, |p2'|)`.
  *
  * Scores are micro-averaged over all documents:
  * P = Σ per-prediction credit / #predictions,
  * R = Σ per-truth credit / #truth paths, F = harmonic mean.
  */
object TaxoMetrics {

  final case class PRF(p: Double, r: Double, f: Double)

  def nodeScore(p1: Seq[String], p2: Seq[String]): Double = {
    val a = p1.drop(2).toSet
    val b = p2.drop(2).toSet
    val mx = math.max(a.size, b.size)
    if (mx == 0) { if (p1 == p2) 1.0 else 0.0 }
    else a.intersect(b).size.toDouble / mx
  }

  private def prf(num: Double, nPred: Long, nTruth: Long, numR: Double): PRF = {
    val p = if (nPred == 0) 0.0 else num / nPred
    val r = if (nTruth == 0) 0.0 else numR / nTruth
    val f = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    PRF(p, r, f)
  }

  /** `predictions`: per doc, the top-k predicted paths (ordered);
    * `truth`: per doc, the gold paths. Docs must appear in `truth`.
    */
  def exact(
      predictions: Map[String, Seq[Seq[String]]],
      truth: Map[String, Seq[Seq[String]]]): PRF = {
    var hits = 0L; var nPred = 0L; var nTruth = 0L
    truth.foreach { case (doc, gold) =>
      val pred = predictions.getOrElse(doc, Seq.empty)
      nPred += pred.size; nTruth += gold.size
      hits += pred.count(p => gold.contains(p))
    }
    prf(hits.toDouble, nPred, nTruth, hits.toDouble)
  }

  def node(
      predictions: Map[String, Seq[Seq[String]]],
      truth: Map[String, Seq[Seq[String]]]): PRF = {
    var pCredit = 0.0; var rCredit = 0.0; var nPred = 0L; var nTruth = 0L
    truth.foreach { case (doc, gold) =>
      val pred = predictions.getOrElse(doc, Seq.empty)
      nPred += pred.size; nTruth += gold.size
      pred.foreach { p => if (gold.nonEmpty) pCredit += gold.map(nodeScore(p, _)).max }
      gold.foreach { g => if (pred.nonEmpty) rCredit += pred.map(nodeScore(_, g)).max }
    }
    prf(pCredit, nPred, nTruth, rCredit)
  }

  /** Root-to-node path for every concept given `(child → parent)` links. */
  def paths(parentOf: Map[String, String], textOf: Map[String, String]): Map[String, Seq[String]] = {
    def pathIds(c: String, seen: Set[String]): List[String] =
      parentOf.get(c) match {
        case Some(p) if !seen(p) => pathIds(p, seen + c) :+ c
        case _                   => List(c)
      }
    textOf.keys.map(c => c -> pathIds(c, Set(c)).map(textOf)).toMap
  }
}
