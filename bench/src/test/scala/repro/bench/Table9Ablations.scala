package repro.bench

import repro.SparkSpec
import repro.benchgen.{EvalHarness, Metrics, Systems}

/** Table 9: DataVinci ablations on the synthetically corrupted corpus.
  * Paper's shape: full DataVinci leads (54.1 / 68.9 / 60.6); removing
  * learned concretization hurts most (46.3 / 51.0 / 48.5); no semantic
  * abstraction and limited semantic concretization both reduce precision
  * and recall; edit-distance-only ranking is mildly worse.
  */
class Table9Ablations extends SparkSpec {

  private val ablations = Seq("DataVinci", "NoSemantic", "LimitedConc", "NoLearnedConc", "EditDistRank")

  test("Table 9: ablation repair metrics on the synthetic corpus") {
    import BenchRun._
    val out = EvalHarness.run(BenchRun.spark, synthetic, ablations).cache()
    val t9  = Metrics.repair(out).orderBy("system").cache()
    show("Table 9 — Ablations (synthetic)", t9)

    def f1(s: String)     = metric(t9, "synthetic", s, "f1")
    def recall(s: String) = metric(t9, "synthetic", s, "recall")

    // full DataVinci is at least as good as every ablation on F1
    for (s <- ablations if s != "DataVinci")
      assert(f1("DataVinci") >= f1(s), s"ablation $s F1 ${f1(s)} vs full ${f1("DataVinci")}")

    // removing semantics reduces recall (semantic repairs become impossible)
    assert(recall("DataVinci") >= recall("NoSemantic"))
    assert(recall("DataVinci") >= recall("LimitedConc"))
  }
}
