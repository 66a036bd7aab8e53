package repro.bench

import repro.SparkSpec
import repro.benchgen.Metrics

/** Table 7: repair precision conditioned on correct detection — the paper's
  * way of disentangling detection from repair quality. Shape: rates are
  * substantially higher than Table 6 for every system; DataVinci leads on
  * all three corpora (89.0 / 91.2 / 80.3); T5 trails (67.4 / 70.1 / 68.8).
  */
class Table7RepairGivenDetection extends SparkSpec {

  test("Table 7: repair rate on correctly detected errors") {
    import BenchRun._
    val t7 = Metrics.repairGivenDetection(outcomes).orderBy("benchmark", "system").cache()
    show("Table 7 — Repair rate over correct detections", t7)

    val rep = Metrics.repair(outcomes).cache()
    val systems = repro.benchgen.Systems.all
    def rr(b: String, s: String) = metric(t7, b, s, "repairRate")

    // DataVinci leads among systems with comparable detection coverage; a
    // system that detects only the easy (e.g. categorical) errors trivially
    // repairs a high share of them, so the conditional rate is only
    // comparable when detection recall is at least half of DataVinci's.
    // The 5-point tolerance matches the paper's own Table-7 margins
    // (89.0 vs 87.3).
    for (b <- Seq("wikipedia", "excel", "synthetic"); s <- systems if s != "DataVinci") {
      val comparable = metric(t7, b, s, "detected") >= 50 &&
        metric(t7, b, s, "detRecall") >= metric(t7, b, "DataVinci", "detRecall") / 2
      if (comparable)
        assert(rr(b, "DataVinci") >= rr(b, s) - 5.0, s"$b repair-given-detection: $s")
    }
    for (b <- Seq("wikipedia", "excel"))
      assert(rr(b, "DataVinci") >= 60.0, s"$b: DataVinci repair rate should be high")

    // conditioning on correct detection raises precision vs the overall
    // (detection + repair) precision of Table 6 — §5.2's observation
    for (b <- Seq("wikipedia", "excel"))
      assert(rr(b, "DataVinci") >= metric(rep, b, "DataVinci", "precision"))
  }
}
