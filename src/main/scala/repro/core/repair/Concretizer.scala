package repro.core.repair

import repro.core.Table
import repro.core.pattern.{Masks, Pattern}
import repro.core.repair.Predicates.Feature
import scala.collection.mutable

/** Concretization constraints for one significant pattern (§3.4).
  *
  * For every abstract slot (character class, disjunction occurrence, or
  * semantic mask) we collect training examples from the rows whose value
  * matches the pattern — the label is the character / alternative / entity
  * suggestion that allowed the transition — and learn a small decision tree
  * over the table's predicate features. Prediction falls back to the
  * majority label at the slot, then at the token, when no tree reaches the
  * accuracy threshold α.
  */
final class Concretizer(
    table: Table,
    feats: Vector[Feature],
    pattern: Pattern,
    maskedValues: Vector[String],
    maskSuggestions: Vector[Vector[String]],
    alpha: Double,
) {

  /** Rows whose (masked) value is in the pattern's language. */
  val matchingRows: Vector[Int] =
    maskedValues.indices.toVector.filter(r => pattern.matches(maskedValues(r)))

  private val dagCache = mutable.Map.empty[Int, Dag]
  private def dagFor(len: Int): Dag = dagCache.getOrElseUpdate(len, Dag.build(pattern, len))

  private val caps: Map[Int, EditDp.Captures] =
    matchingRows.flatMap { r =>
      EditDp.captures(dagFor(maskedValues(r).length), maskedValues(r)).map(r -> _)
    }.toMap

  // ---- training examples -------------------------------------------------

  private lazy val clsBySlot: Map[SlotKey, Vector[(Int, String)]] =
    caps.toVector.flatMap { case (r, c) => c.clsChars.map { case (s, ch) => (s, r, ch.toString) } }
      .groupBy(_._1).view.mapValues(_.map(t => (t._2, t._3))).toMap

  private lazy val clsByTok: Map[Int, Vector[(Int, String)]] =
    clsBySlot.toVector.flatMap { case (s, ex) => ex.map(e => (s.tokId, e)) }
      .groupBy(_._1).view.mapValues(_.map(_._2)).toMap

  private lazy val disjByOcc: Map[(Int, Vector[Int]), Vector[(Int, String)]] =
    caps.toVector.flatMap { case (r, c) =>
      c.disjChoice.map { case ((d, occ), alt) => ((d, occ), r, alt) }
    }.groupBy(_._1).view.mapValues(_.map(t => (t._2, altString(t._1._1, t._3)))).toMap

  private lazy val disjByTok: Map[Int, Vector[(Int, String)]] =
    disjByOcc.toVector.flatMap { case ((d, _), ex) => ex.map(e => (d, e)) }
      .groupBy(_._1).view.mapValues(_.map(_._2)).toMap

  private def altString(disjId: Int, altIdx: Int): String = {
    val dag = dagCache.values.headOption.getOrElse(dagFor(1))
    dag.disjAlts(disjId)(altIdx)
  }

  private lazy val maskBySlot: Map[SlotKey, Vector[(Int, String)]] =
    caps.toVector.flatMap { case (r, c) =>
      c.maskAt.flatMap { case (slot, pos) =>
        val occIdx = maskedValues(r).take(pos).count(Masks.isMask)
        maskSuggestions(r).lift(occIdx).map(sug => (slot, r, sug))
      }
    }.groupBy(_._1).view.mapValues(_.map(t => (t._2, t._3))).toMap

  private lazy val maskByTok: Map[Int, Vector[(Int, String)]] =
    maskBySlot.toVector.flatMap { case (s, ex) => ex.map(e => (s.tokId, e)) }
      .groupBy(_._1).view.mapValues(_.map(_._2)).toMap

  // ---- tree cache --------------------------------------------------------

  private val trees = mutable.Map.empty[(String, Any), Option[DecisionTree.DTree]]

  private def treeFor(kind: String, key: Any, examples: Vector[(Int, String)]): Option[DecisionTree.DTree] =
    trees.getOrElseUpdate((kind, key), DecisionTree.learn(feats, examples, alpha))

  private def majority(ex: Vector[(Int, String)]): Option[String] =
    if (ex.isEmpty) None
    else Some(ex.groupBy(_._2).view.mapValues(_.size).toVector
      .sortBy { case (l, c) => (-c, l) }.head._1)

  private def predict(kind: String, key: Any, bySlot: Vector[(Int, String)],
                      byTok: Vector[(Int, String)], row: Int): Option[String] = {
    val slotPred = treeFor(kind, key, bySlot).map(_.predict(row, feats))
    slotPred
      .orElse(majority(bySlot))
      .orElse(majority(byTok))
  }

  // ---- public API --------------------------------------------------------

  /** Concretize an abstract character-class emission for an error row.
    * A substitution first tries to *transfer the consumed input character*
    * into the class — case fold and visual-typo inverse (`0↔o`, `1↔l`, …) —
    * which is what recovers capitalization flips and look-alike typos
    * exactly; learned constraints and majority labels are the fallback.
    */
  def concretizeCls(unit: ECls, row: Int): Char = {
    unit.from.flatMap(Concretizer.foldInto(_, unit.cc)) match {
      case Some(c) => c
      case None =>
        val slotEx = clsBySlot.getOrElse(unit.slot, Vector.empty)
        val tokEx  = clsByTok.getOrElse(unit.slot.tokId, Vector.empty)
        predict("cls", unit.slot, slotEx, tokEx, row)
          .flatMap(_.headOption)
          .getOrElse(unit.cc.sample.head)
    }
  }

  /** Concretize an abstract disjunction choice for an error row. */
  def concretizeDisj(unit: EDisj, row: Int): String = {
    val occEx = disjByOcc.getOrElse((unit.disjId, unit.occ), Vector.empty)
    val tokEx = disjByTok.getOrElse(unit.disjId, Vector.empty)
    predict("disj", (unit.disjId, unit.occ), occEx, tokEx, row)
      .getOrElse(unit.alts.head)
  }

  /** Concretize a semantic mask that was *introduced* by the edit program
    * (masks carried over from the input keep their own LLM suggestion).
    */
  def concretizeMask(unit: EMask, row: Int): String = {
    val slotEx = maskBySlot.getOrElse(unit.slot, Vector.empty)
    val tokEx  = maskByTok.getOrElse(unit.slot.tokId, Vector.empty)
    predict("mask", unit.slot, slotEx, tokEx, row)
      .getOrElse(Masks.charFor(unit.semType).toString)
  }

  // ---- enumeration mode (the "no learned concretization" ablation) -------

  /** All candidate strings for a class slot, most frequent captured first
    * (the input-derived fold, when available, leads the list).
    */
  def enumerateCls(unit: ECls, cap: Int = 8): Vector[String] = {
    val fold = unit.from.flatMap(Concretizer.foldInto(_, unit.cc)).map(_.toString).toVector
    val observed = clsBySlot.getOrElse(unit.slot, clsByTok.getOrElse(unit.slot.tokId, Vector.empty))
      .groupBy(_._2).view.mapValues(_.size).toVector.sortBy { case (l, c) => (-c, l) }.map(_._1)
    val rest = unit.cc.sample.map(_.toString).filterNot(observed.contains)
    (fold ++ observed ++ rest).distinct.take(cap)
  }

  /** All alternatives of a disjunction occurrence. */
  def enumerateDisj(unit: EDisj): Vector[String] = unit.alts

  /** All distinct entity suggestions observed for a mask slot. */
  def enumerateMask(unit: EMask, cap: Int = 6): Vector[String] = {
    val observed = maskBySlot.getOrElse(unit.slot, maskByTok.getOrElse(unit.slot.tokId, Vector.empty))
      .groupBy(_._2).view.mapValues(_.size).toVector.sortBy { case (l, c) => (-c, l) }.map(_._1)
    if (observed.isEmpty) Vector(Masks.charFor(unit.semType).toString) else observed.take(cap)
  }
}

object Concretizer {
  private val visual = Map('o' -> '0', 'l' -> '1', 'e' -> '3', 'a' -> '4', 't' -> '7', 's' -> '5')
  private val visualInv = visual.map(_.swap)

  /** Map an input character into a class via case fold or the visual-typo
    * table (both directions); `None` if no mapping lands in the class.
    */
  def foldInto(c: Char, cc: repro.core.pattern.CharClassT): Option[Char] =
    Vector(c.toUpper, c.toLower) .find(x => x != c && cc.contains(x))
      .orElse(visual.get(c.toLower).filter(cc.contains))
      .orElse(visualInv.get(c).filter(cc.contains))
      .orElse(visualInv.get(c).map(_.toUpper).filter(cc.contains))
}
