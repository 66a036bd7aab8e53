package repro.core

import repro.core.pattern.PatternLearner
import repro.core.repair.{Concretizer, Predicates}
import repro.formulas.{Errors, Expr, FormulaEval}

/** Execution-guided repair (§3.6): run a column-transformation program over
  * the table, partition rows into successes and failures, learn patterns
  * *only over the succeeding input values* (all of which are treated as
  * significant), flag the failing inputs as data errors, and repair them with
  * the ordinary pattern-based procedure.
  */
object ExecutionGuided {

  /** Outcome of execution-guided cleaning. */
  final case class Result(
      /** Rows whose formula output was an error before repairs. */
      failingBefore: Set[Int],
      /** Rows still failing after repairs are applied. */
      failingAfter: Set[Int],
      /** Suggested repairs: (colIdx, row) → repaired value. */
      repairs: Map[(Int, Int), String],
      /** The table with repairs applied. */
      repairedTable: Table,
  )

  /** Rows for which the formula evaluates to an error value. */
  def failingRows(table: Table, formula: Expr): Set[Int] = {
    val order = table.cols.map(_.name)
    (0 until table.numRows).filter { r =>
      Errors.isError(FormulaEval.evalToCell(formula, table.row(r), order))
    }.toSet
  }

  /** Clean the given input columns using the formula's execution signal. */
  def clean(table: Table, formula: Expr, inputCols: Vector[Int],
            cfg: DataVinci.Config = DataVinci.Config()): Result = {
    val before = failingRows(table, formula)
    if (before.isEmpty) return Result(before, before, Map.empty, table)

    lazy val feats = Predicates.featuresOf(table)
    var repaired  = table
    var allRepairs = Map.empty[(Int, Int), String]

    for (c <- inputCols) {
      val values = table.col(c).values
      val mvs    = DataVinci.maskedValues(values, cfg)
      val masked = mvs.map(_.masked)
      val successMasked = masked.indices.filterNot(before).map(masked)

      if (successMasked.nonEmpty) {
        // every pattern learned over succeeding inputs is significant (§3.6)
        val sig = PatternLearner.learn(successMasked, cfg.maxPatterns).patterns
        if (sig.nonEmpty) {
          val nonErrorValues = values.indices.filterNot(before).map(values).toVector
          lazy val cons = sig.map { case (p, cov) =>
            (p, cov, new Concretizer(table, feats, p, masked, mvs.map(_.occs.map(_.suggestion)), cfg.alpha))
          }
          for (r <- before.toVector.sorted) {
            // a failing row's input is an error unless it already fits the
            // success-side language (multi-column: the fault may be elsewhere)
            if (!sig.exists(_._1.matches(masked(r)))) {
              val cell = DataVinci.repairCell(r, values(r), mvs(r), cons, nonErrorValues, cfg)
              cell.suggestion.foreach { s =>
                allRepairs += (c, r) -> s
                repaired = repaired.updated(c, r, s)
              }
            }
          }
        }
      }
    }

    Result(before, failingRows(repaired, formula), allRepairs, repaired)
  }

  /** The unsupervised comparison point: ordinary DataVinci cleaning of the
    * input columns, repairs applied only to rows with failing executions
    * (the evaluation protocol of §5.3).
    */
  def cleanUnsupervised(table: Table, formula: Expr, inputCols: Vector[Int],
                        cfg: DataVinci.Config = DataVinci.Config()): Result = {
    val before = failingRows(table, formula)
    if (before.isEmpty) return Result(before, before, Map.empty, table)
    var repaired = table
    var allRepairs = Map.empty[(Int, Int), String]
    lazy val feats = Predicates.featuresOf(table)
    for (c <- inputCols) {
      val res = DataVinci.cleanColumn(table, c, cfg, Some(feats))
      for (r <- res.errors if before.contains(r); s <- res.suggestionFor(r)) {
        allRepairs += (c, r) -> s
        repaired = repaired.updated(c, r, s)
      }
    }
    Result(before, failingRows(repaired, formula), allRepairs, repaired)
  }
}
