package repro.pipeline

import repro.SparkSpec
import repro.bench.Tables
import repro.data.Scenarios
import repro.metrics.RankMetrics

/** Diagnostic probe for the CoronaCheck configuration (not part of the
  * default shape assertions): isolates the effect of γ-merge, bucketing
  * and walk budget on W-RW quality.
  */
class CoronaProbeSpec extends SparkSpec {
  ignore("corona W-RW ablation probe") {
    val sc = Scenarios.corona(spark, Scenarios.CoronaParams(nGen = 250))
    for {
      (gamma, buckets) <- Seq((false, false), (false, true), (true, true))
      (nw, wl) <- Seq((10, 10), (30, 15))
    } {
      val bench = Tables.Bench(numWalks = nw, walkLength = wl)
      val r = Tables.wrw(spark, sc, expand = false, gamma, buckets, bench)
      val mrr = RankMetrics.mrr(r.ranked, sc.truth)
      println(f"PROBE gamma=$gamma buckets=$buckets walks=${nw}x$wl mrr=$mrr%.3f")
    }
  }
}
