package repro.bench

import repro.SparkSpec
import repro.benchgen.{EvalHarness, Metrics}

/** Table 8: execution success rates on the Excel-Formulas corpus after
  * applying each system's repairs (only to inputs of failing rows).
  * Paper's shape: No-Repair formula success is 0% by construction;
  * DataVinci+Execution leads (54.0% single / 47.8% multi), beating
  * unsupervised DataVinci (43.2% / 35.7%) and all baselines; T5 is the
  * weakest repairer; cell-level success rises for every system.
  * (HoloClean is excluded, as in the paper — it timed out there.)
  */
class Table8ExecutionGuided extends SparkSpec {

  private val systems = Seq("No Repair", "WMRR", "Raha", "T5",
    "DataVinci Unsupervised", "DataVinci+Execution")

  test("Table 8: formula- and cell-level execution success") {
    import BenchRun._
    val out = EvalHarness.runFormulas(BenchRun.spark, formulas, systems).cache()
    val t8  = Metrics.executionSuccess(out).cache()
    show("Table 8 — Execution success after repair", t8)

    val m = t8.collect().map { r =>
      (r.getAs[String]("system"), r.getAs[Boolean]("multiColumn")) ->
        (r.getAs[Double]("formulaSuccessPct"), r.getAs[Double]("cellSuccessPct"))
    }.toMap

    for (multi <- Seq(false, true)) {
      val noRepair = m(("No Repair", multi))
      assert(noRepair._1 == 0.0, "every table has a failing row by construction")

      val exec  = m(("DataVinci+Execution", multi))
      val unsup = m(("DataVinci Unsupervised", multi))
      // execution guidance beats the unsupervised variant
      assert(exec._1 >= unsup._1, s"multi=$multi formula-level")
      assert(exec._2 >= unsup._2 - 0.1, s"multi=$multi cell-level")
      // and beats every non-DataVinci baseline
      for (s <- Seq("WMRR", "Raha", "T5"))
        assert(exec._1 >= m((s, multi))._1, s"multi=$multi vs $s")
      // every system improves cell-level success over no repair
      for (s <- systems if s != "No Repair")
        assert(m((s, multi))._2 >= noRepair._2 - 0.1, s"multi=$multi $s cell-level")
      // single-column is easier than multi-column for DataVinci+Execution
    }
    assert(m(("DataVinci+Execution", false))._1 >= m(("DataVinci+Execution", true))._1 - 5.0)
  }
}
