package repro.benchgen

import scala.util.Random

/** The seven noise-operation classes of §4.2, applied exactly as the paper
  * describes for the Synthetic-Errors benchmark: cells are corrupted with
  * 20% probability; a corrupted cell receives 1–4 operations (25% each),
  * sampled without replacement from the class set.
  *
  * Each class is tagged with whether it *preserves content information* —
  * the signal the harness uses to split repair cases into "certain" (the
  * clean value is uniquely recoverable) and "possible" (several repairs are
  * reasonable), mirroring the paper's hand-annotation protocol (§5.2).
  */
object Corruptions {

  /** One noise-operation class. `recoverable` = a repair system could in
    * principle reconstruct the exact clean value from the dirty one.
    */
  sealed abstract class Op(val name: String, val recoverable: Boolean) {
    /** Apply to `v`; `None` when not applicable (e.g. no digits to swap). */
    def apply(v: String, rng: Random): Option[String]
  }

  private val Delims  = "-_./:,;| "
  private val VisualTypos = Map('o' -> '0', 'l' -> '1', 'e' -> '3', 'a' -> '4', 't' -> '7', 's' -> '5')

  /** Class 1: random character insertion / deletion / change. */
  case object CharNoise extends Op("char", recoverable = false) {
    def apply(v: String, rng: Random): Option[String] = {
      if (v.isEmpty) return None
      val pool = "abcdefghijklmnopqrstuvwxyzABCDEFGHIJKLMNOPQRSTUVWXYZ0123456789"
      rng.nextInt(3) match {
        case 0 => // insert
          val i = rng.nextInt(v.length + 1)
          Some(v.substring(0, i) + pool(rng.nextInt(pool.length)) + v.substring(i))
        case 1 => // delete (an alphanumeric char, so it's not a delimiter op)
          val idx = v.indices.filter(v(_).isLetterOrDigit)
          if (idx.isEmpty) None
          else { val i = idx(rng.nextInt(idx.size)); Some(v.substring(0, i) + v.substring(i + 1)) }
        case _ => // change
          val idx = v.indices.filter(v(_).isLetterOrDigit)
          if (idx.isEmpty) None
          else {
            val i = idx(rng.nextInt(idx.size))
            val c = Iterator.continually(pool(rng.nextInt(pool.length))).dropWhile(_ == v(i)).next()
            Some(v.updated(i, c))
          }
      }
    }
  }

  /** Class 2: random delimiter insertion / deletion / change. */
  case object DelimNoise extends Op("delim", recoverable = true) {
    def apply(v: String, rng: Random): Option[String] = {
      val delimIdx = v.indices.filter(i => Delims.contains(v(i)))
      rng.nextInt(3) match {
        case 0 => // insert at a run boundary
          if (v.isEmpty) None
          else {
            val i = 1 + rng.nextInt(v.length)
            Some(v.substring(0, i) + Delims(rng.nextInt(Delims.length - 1)) + v.substring(i))
          }
        case 1 => // delete
          if (delimIdx.isEmpty) None
          else { val i = delimIdx(rng.nextInt(delimIdx.size)); Some(v.substring(0, i) + v.substring(i + 1)) }
        case _ => // change
          if (delimIdx.isEmpty) None
          else {
            val i = delimIdx(rng.nextInt(delimIdx.size))
            val c = Iterator.continually(Delims(rng.nextInt(Delims.length))).dropWhile(_ == v(i)).next()
            Some(v.updated(i, c))
          }
      }
    }
  }

  /** Class 3: swap two adjacent digits. */
  case object DigitSwap extends Op("digitswap", recoverable = false) {
    def apply(v: String, rng: Random): Option[String] = {
      val pairs = (0 until v.length - 1).filter(i => v(i).isDigit && v(i + 1).isDigit && v(i) != v(i + 1))
      if (pairs.isEmpty) None
      else {
        val i = pairs(rng.nextInt(pairs.size))
        Some(v.substring(0, i) + v(i + 1) + v(i) + v.substring(i + 2))
      }
    }
  }

  /** Class 4: random shuffle of all characters. */
  case object Shuffle extends Op("shuffle", recoverable = false) {
    def apply(v: String, rng: Random): Option[String] =
      if (v.length < 2) None
      else {
        val shuffled = rng.shuffle(v.toVector).mkString
        if (shuffled == v) None else Some(shuffled)
      }
  }

  /** Class 5: random capitalization flip. */
  case object Caps extends Op("caps", recoverable = true) {
    def apply(v: String, rng: Random): Option[String] = {
      val idx = v.indices.filter(v(_).isLetter)
      if (idx.isEmpty) None
      else {
        val i = idx(rng.nextInt(idx.size))
        val c = if (v(i).isUpper) v(i).toLower else v(i).toUpper
        Some(v.updated(i, c))
      }
    }
  }

  /** Class 6: decimal ↔ comma swap in numerics. */
  case object DecimalComma extends Op("deccomma", recoverable = true) {
    def apply(v: String, rng: Random): Option[String] =
      if (!v.exists(_.isDigit)) None
      else if (v.contains('.')) Some(v.replaceFirst("\\.", ","))
      else if (v.contains(',')) Some(v.replaceFirst(",", "."))
      else None
  }

  /** Class 7: visually-inspired typos {o→0, l→1, e→3, a→4, t→7, s→5}. */
  case object VisualTypo extends Op("visual", recoverable = true) {
    def apply(v: String, rng: Random): Option[String] = {
      val idx = v.indices.filter(i => VisualTypos.contains(v(i).toLower))
      if (idx.isEmpty) None
      else {
        val i = idx(rng.nextInt(idx.size))
        Some(v.updated(i, VisualTypos(v(i).toLower)))
      }
    }
  }

  /** All seven operation classes. */
  val all: Vector[Op] = Vector(CharNoise, DelimNoise, DigitSwap, Shuffle, Caps, DecimalComma, VisualTypo)

  /** Result of corrupting a cell. */
  final case class Corrupted(dirty: String, ops: Vector[String]) {
    /** The clean value is uniquely recoverable from the dirty one. */
    def certain: Boolean = ops.forall(n => all.find(_.name == n).exists(_.recoverable))
  }

  /** Sampling pool: the paper samples op classes without replacement but
    * does not state weights; we weight the recoverable classes (delimiter,
    * capitalization, decimal/comma, visual typos) double — the common data
    * entry mistakes its examples illustrate — which keeps a majority of
    * corrupted cells uniquely repairable, as the paper's repair-recall
    * levels imply.
    */
  private val weightedPool: Vector[Op] = all ++ all.filter(_.recoverable)

  /** Apply `nOps` operation classes (sampled without replacement) to `v`;
    * `None` when no applicable operation changed the value.
    */
  def corrupt(v: String, rng: Random, nOps: Int): Option[Corrupted] = {
    val chosen = rng.shuffle(weightedPool).distinct.take(nOps)
    var cur = v
    val applied = Vector.newBuilder[String]
    for (op <- chosen) op(cur, rng).foreach { w => if (w != cur) { cur = w; applied += op.name } }
    val ops = applied.result()
    if (cur == v || ops.isEmpty) None else Some(Corrupted(cur, ops))
  }

  /** Paper's op-count distribution: 1–4 with 25% probability each. */
  def sampleOpCount(rng: Random): Int = 1 + rng.nextInt(4)
}
