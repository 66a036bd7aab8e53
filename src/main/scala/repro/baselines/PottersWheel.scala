package repro.baselines

import repro.core.Table

/** Potter's Wheel-in-spirit (Raman & Hellerstein 2001; §4.3 baseline 5):
  * infers the column's *structure* by minimum description length over a
  * small structure grammar (the coarse run signatures) and flags values
  * that do not fit the chosen structure. The original is interactive; its
  * automatic component is exactly this structure-inference discrepancy
  * detector, which is what the Auto-Detect paper's released annotations
  * evaluate. Detection-only; repairs via [[LlmRepair]].
  */
final class PottersWheel extends CleaningSystem {
  def name = "Potters-Wheel"

  def clean(table: Table): Map[Int, ColumnOutcome] =
    table.cols.indices.map { c =>
      val values = table.col(c).values
      val n      = math.max(1, values.size)
      val bySig  = values.groupBy(ColumnStats.coarseSig)

      // MDL: cost(structure S) = |S| + Σ_v cost(v | S); a value outside S
      // pays its full length. Choose the structure set greedily: add
      // signatures while they reduce total description length.
      // the original keeps the structure set small (an interactive system
      // shows the user one or two inferred structures); capping at two is
      // what produces its characteristic false positives on legitimately
      // heterogeneous columns
      val sigsByCount = bySig.toVector.sortBy { case (s, vs) => (-vs.size, s) }
      var covered   = Set.empty[String]
      var totalCost = values.map(_.length + 1).sum.toDouble // null structure
      var improved  = true
      for ((sig, vs) <- sigsByCount if improved && covered.size < 2) {
        val withSig = covered + sig
        val cost = withSig.toVector.map(_.length + 2).sum +
          values.map(v => if (withSig.contains(ColumnStats.coarseSig(v))) 1 else v.length + 1).sum
        if (cost < totalCost) { covered = withSig; totalCost = cost }
        else improved = false
      }

      val errors =
        if (covered.isEmpty) Set.empty[Int]
        else values.indices.filter(r => !covered.contains(ColumnStats.coarseSig(values(r)))).toSet
      val repairs = errors.iterator.flatMap(r => LlmRepair.repair(table, c, r).map(r -> _)).toMap
      c -> ColumnOutcome(errors, repairs)
    }.toMap
}
