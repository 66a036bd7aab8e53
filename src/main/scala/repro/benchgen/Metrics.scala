package repro.benchgen

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions._

/** Metric aggregations over the [[CellOutcome]] fact table — all expressed
  * in the DataFrame API so they run as Catalyst plans and can be
  * cross-checked against DuckDB by [[repro.Oracle]].
  *
  * Conventions (matching §5):
  *  - detection precision/recall are over ground-truth error cells;
  *  - *fire rate* is the average over columns of the fraction of cells
  *    flagged;
  *  - repair "certain" precision counts exact-match repairs over
  *    suggestions on uniquely-recoverable error cells plus false-positive
  *    suggestions; "possible" precision additionally accepts
  *    latent-language-valid repairs on non-recoverable error cells;
  *  - repair recall is exact repairs over all injected errors.
  */
object Metrics {

  /** Table-5 detection metrics per (benchmark, system). */
  def detection(cells: Dataset[CellOutcome]): DataFrame = {
    val df = cells.toDF
    val base = df.groupBy("benchmark", "system").agg(
      sum(when(col("flagged") && col("isError"), 1).otherwise(0)).as("tp"),
      sum(when(col("flagged") && !col("isError"), 1).otherwise(0)).as("fp"),
      sum(when(!col("flagged") && col("isError"), 1).otherwise(0)).as("fn"),
    )
    val fire = df.groupBy("benchmark", "system", "tableId", "col")
      .agg(avg(col("flagged").cast("double")).as("colFire"))
      .groupBy("benchmark", "system").agg(avg("colFire").as("fireRate"))
    base.join(fire, Seq("benchmark", "system"))
      .withColumn("precision", round(col("tp") * 100.0 / greatest(col("tp") + col("fp"), lit(1)), 1))
      .withColumn("recall",    round(col("tp") * 100.0 / greatest(col("tp") + col("fn"), lit(1)), 1))
      .withColumn("f1", round(lit(2) * col("precision") * col("recall") /
        greatest(col("precision") + col("recall"), lit(0.001)), 1))
      .withColumn("fireRatePct", round(col("fireRate") * 100, 2))
      .select("benchmark", "system", "precision", "recall", "f1", "fireRatePct", "tp", "fp", "fn")
  }

  /** Table-6 repair metrics per (benchmark, system). */
  def repair(cells: Dataset[CellOutcome]): DataFrame = {
    val df = cells.toDF
      .withColumn("suggested", col("suggestion") =!= "")
      .withColumn("exact", col("suggested") && col("isError") && (col("suggestion") === col("clean")))
      .withColumn("plausible", col("exact") || (col("suggested") && col("isError") && col("suggestionValid")))
    df.groupBy("benchmark", "system").agg(
      // certain bucket: suggestions on recoverable errors + FP suggestions
      sum(when(col("suggested") && ((col("isError") && col("certain")) || !col("isError")), 1).otherwise(0)).as("certDen"),
      sum(when(col("exact") && col("certain"), 1).otherwise(0)).as("certNum"),
      // possible bucket: suggestions on non-recoverable errors + FP suggestions
      sum(when(col("suggested") && ((col("isError") && !col("certain")) || !col("isError")), 1).otherwise(0)).as("possDen"),
      sum(when(col("plausible") && !col("certain"), 1).otherwise(0)).as("possNum"),
      // overall precision/recall/F1 (synthetic reporting)
      sum(when(col("suggested"), 1).otherwise(0)).as("sugDen"),
      sum(when(col("exact"), 1).otherwise(0)).as("exactNum"),
      sum(when(col("isError"), 1).otherwise(0)).as("errTotal"),
    )
      .withColumn("precCertain",  round(col("certNum") * 100.0 / greatest(col("certDen"), lit(1)), 1))
      .withColumn("precPossible", round(col("possNum") * 100.0 / greatest(col("possDen"), lit(1)), 1))
      .withColumn("precision",    round(col("exactNum") * 100.0 / greatest(col("sugDen"), lit(1)), 1))
      .withColumn("recall",       round(col("exactNum") * 100.0 / greatest(col("errTotal"), lit(1)), 1))
      .withColumn("f1", round(lit(2) * col("precision") * col("recall") /
        greatest(col("precision") + col("recall"), lit(0.001)), 1))
      .select("benchmark", "system", "precCertain", "precPossible", "precision", "recall", "f1", "sugDen")
  }

  /** Table-7: repair precision conditioned on correct detections. On the
    * hand-annotated benchmarks (wikipedia/excel) a repair counts when exact
    * or latent-language-valid; on synthetic, exact only.
    */
  def repairGivenDetection(cells: Dataset[CellOutcome]): DataFrame = {
    val df = cells.toDF
      .withColumn("detected", col("flagged") && col("isError"))
      .withColumn("exact", col("detected") && (col("suggestion") === col("clean")))
      .withColumn("ok", col("exact") ||
        (col("detected") && col("suggestionValid") && !(col("benchmark") === "synthetic")))
    df.groupBy("benchmark", "system").agg(
      sum(when(col("detected"), 1).otherwise(0)).as("detected"),
      sum(when(col("ok"), 1).otherwise(0)).as("repaired"),
      sum(when(col("isError"), 1).otherwise(0)).as("errTotal"),
    ).withColumn("repairRate", round(col("repaired") * 100.0 / greatest(col("detected"), lit(1)), 1))
      .withColumn("detRecall", round(col("detected") * 100.0 / greatest(col("errTotal"), lit(1)), 1))
      .select("benchmark", "system", "repairRate", "detected", "repaired", "detRecall")
  }

  /** Table-8: cell- and formula-level execution success per system. */
  def executionSuccess(outcomes: Dataset[FormulaOutcome]): DataFrame = {
    outcomes.toDF.groupBy("system", "multiColumn").agg(
      round(avg(when(col("failingAfter") === 0, 1.0).otherwise(0.0)) * 100, 1).as("formulaSuccessPct"),
      round(avg((col("nRows") - col("failingAfter")) / col("nRows")) * 100, 1).as("cellSuccessPct"),
      count(lit(1)).as("tables"),
    ).orderBy("multiColumn", "system")
  }

  /** Table-3: benchmark corpus statistics. */
  def benchStats(tables: Dataset[GenTable]): DataFrame = {
    import tables.sparkSession.implicits._
    tables.map(t => (t.benchmark, t.colNames.size, t.nRows))
      .toDF("benchmark", "nCols", "nRows")
      .groupBy("benchmark").agg(
        count(lit(1)).as("tables"),
        round(avg("nCols"), 1).as("avgCols"),
        round(avg("nRows"), 1).as("avgRows"),
      )
  }
}
