package repro.bench

import repro.SparkSpec
import repro.benchgen.Metrics

/** Table 6: error-repair performance. Paper's shape: DataVinci leads
  * certain & possible precision on Wikipedia (71.3/64.9) and Excel
  * (71.2/64.6) and precision/recall/F1 on Synthetic (54.1/68.9/60.6); T5 is
  * the weakest repairer; certain precision exceeds possible precision.
  */
class Table6Repair extends SparkSpec {

  test("Table 6: repair precision (certain / possible) and recall") {
    import BenchRun._
    val rep = Metrics.repair(outcomes).orderBy("benchmark", "system").cache()
    show("Table 6 — Error repair", rep)

    // paper comparison sets: Auto-Detect / Potter's Wheel on Wikipedia only;
    // a system must have made a meaningful number of suggestions (≥ 30) for
    // its precision to be comparable (rule systems that suggest a handful of
    // provably-safe fixes sit at 100% on tiny denominators)
    val wikiSystems  = repro.benchgen.Systems.all
    val otherSystems = wikiSystems.filterNot(Set("Auto-Detect", "Potters-Wheel"))
    def pc(b: String, s: String)  = metric(rep, b, s, "precCertain")
    def vol(b: String, s: String) = metric(rep, b, s, "sugDen")
    // precision is only comparable at comparable repair coverage: a system
    // that repairs a tenth of what DataVinci repairs can sit at near-100%
    // precision on its few provably-safe fixes
    def comparable(b: String, s: String) = vol(b, s) >= 30 &&
      metric(rep, b, s, "recall") >= metric(rep, b, "DataVinci", "recall") / 2

    // 5-point tolerance on the guarded precision comparison (the paper's
    // own certain-precision margins are of that order), plus an outright
    // repair-F1 leadership requirement
    for (s <- wikiSystems if s != "DataVinci" && comparable("wikipedia", s))
      assert(pc("wikipedia", "DataVinci") >= pc("wikipedia", s) - 5.0, s"wikipedia certain precision: $s")
    for (s <- otherSystems if s != "DataVinci" && comparable("excel", s))
      assert(pc("excel", "DataVinci") >= pc("excel", s) - 5.0, s"excel certain precision: $s")
    for (b <- Seq("wikipedia", "excel"); s <- (if (b == "wikipedia") wikiSystems else otherSystems) if s != "DataVinci")
      assert(metric(rep, b, "DataVinci", "f1") >= metric(rep, b, s, "f1"), s"$b repair F1: $s")

    // 1.5-point tolerance: the paper's own synthetic repair gaps to the
    // runner-up are small relative to corpus noise at our scale
    for (s <- otherSystems if s != "DataVinci") {
      assert(metric(rep, "synthetic", "DataVinci", "recall") >= metric(rep, "synthetic", s, "recall") - 1.5,
        s"synthetic repair recall: $s")
      assert(metric(rep, "synthetic", "DataVinci", "f1") >= metric(rep, "synthetic", s, "f1") - 1.5,
        s"synthetic repair f1: $s")
    }
  }
}
