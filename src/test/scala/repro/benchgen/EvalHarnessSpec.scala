package repro.benchgen

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** Spark-parallel harness over generated corpora, with the metric
  * aggregations oracle-checked against DuckDB.
  */
class EvalHarnessSpec extends SparkSpec {
  import spark.implicits._

  private lazy val smallWiki = BenchData.wikipedia(spark, 6).cache()

  test("run produces one outcome per (system, cell)") {
    val out = EvalHarness.run(spark, smallWiki, Seq("DataVinci", "WMRR")).cache()
    val cells = smallWiki.collect().map(t => t.cells.size).sum
    assert(out.count() == cells * 2)
    assert(out.select("system").distinct().as[String].collect().toSet == Set("DataVinci", "WMRR"))
  }

  test("detection metrics are internally consistent") {
    val out = EvalHarness.run(spark, smallWiki, Seq("DataVinci"))
    val det = Metrics.detection(out).collect().head
    val p = det.getAs[Double]("precision")
    val r = det.getAs[Double]("recall")
    assert(p >= 0 && p <= 100 && r >= 0 && r <= 100)
    assert(det.getAs[Double]("fireRatePct") >= 0)
  }

  test("detection tp/fp/fn agree with DuckDB (oracle)") {
    val out = EvalHarness.run(spark, smallWiki, Seq("DataVinci", "T5"))
      .select($"system",
        $"flagged".cast("string").as("flagged"),
        $"isError".cast("string").as("iserror"))
      .cache()
    val agg = out.groupBy("system").agg(
      sum(when($"flagged" === "true" && $"iserror" === "true", 1).otherwise(0)).as("tp"),
      sum(when($"flagged" === "true" && $"iserror" === "false", 1).otherwise(0)).as("fp"),
      sum(when($"flagged" === "false" && $"iserror" === "true", 1).otherwise(0)).as("fn"),
    ).orderBy("system")
    Oracle.assertEquivalent(agg,
      """SELECT system,
        |  SUM(CASE WHEN flagged='true'  AND iserror='true'  THEN 1 ELSE 0 END) AS tp,
        |  SUM(CASE WHEN flagged='true'  AND iserror='false' THEN 1 ELSE 0 END) AS fp,
        |  SUM(CASE WHEN flagged='false' AND iserror='true'  THEN 1 ELSE 0 END) AS fn
        |FROM outcome GROUP BY system ORDER BY system""".stripMargin,
      "outcome" -> out)
  }

  test("repair metrics expose certain and possible buckets") {
    val out = EvalHarness.run(spark, smallWiki, Seq("DataVinci"))
    val rep = Metrics.repair(out).collect().head
    assert(rep.getAs[Double]("precCertain") >= 0)
    assert(rep.getAs[Double]("precPossible") >= 0)
  }

  test("DataVinci beats T5 on wikipedia detection precision (shape check)") {
    val out = EvalHarness.run(spark, smallWiki, Seq("DataVinci", "T5"))
    val det = Metrics.detection(out).collect().map(r => r.getAs[String]("system") -> r.getAs[Double]("precision")).toMap
    assert(det("DataVinci") > det("T5"))
  }

  test("formula harness: execution guidance beats no-repair") {
    val tables = BenchData.formulas(spark, 8).cache()
    val out = EvalHarness.runFormulas(spark, tables,
      Seq("No Repair", "DataVinci Unsupervised", "DataVinci+Execution")).cache()
    val m = Metrics.executionSuccess(out).collect()
      .map(r => (r.getAs[String]("system"), r.getAs[Boolean]("multiColumn")) -> r.getAs[Double]("formulaSuccessPct")).toMap
    val noRepair = m.collect { case ((s, _), v) if s == "No Repair" => v }
    assert(noRepair.forall(_ == 0.0)) // every table has a failing row by construction
    val exec  = m.collect { case (("DataVinci+Execution", _), v) => v }.sum
    val unsup = m.collect { case (("DataVinci Unsupervised", _), v) => v }.sum
    assert(exec >= unsup)
    assert(exec > 0)
  }

  test("benchmark stats roll up per corpus") {
    val stats = Metrics.benchStats(smallWiki).collect().head
    assert(stats.getAs[String]("benchmark") == "wikipedia")
    assert(stats.getAs[Long]("tables") == 6)
    assert(stats.getAs[Double]("avgCols") >= 4.0)
  }

  test("raha receives its five labels through the harness") {
    val out = EvalHarness.run(spark, smallWiki, Seq("Raha"))
    // with labels, Raha flags at least the labeled clusters on some tables
    assert(out.filter($"flagged").count() > 0)
  }
}
