package repro.core.pattern

/** The character-class lattice used by patterns (§3.1).
  *
  * The paper's classes: digits, cased and uncased letters, alphanumeric,
  * spaces, alphanumeric-with-spaces, and the recurring class [01].
  * Mask symbols are deliberately in no class: a mask can only be matched
  * by its own [[Pattern.MaskTok]].
  */
sealed abstract class CharClassT(val name: String, val regex: String) {
  def contains(c: Char): Boolean
  /** Representative members, used when enumerating concretization candidates. */
  def sample: Seq[Char]
  override def toString: String = name
}

object CharClassT {
  case object Bin01 extends CharClassT("bin01", "[01]") {
    def contains(c: Char): Boolean = c == '0' || c == '1'
    def sample: Seq[Char] = "01"
  }
  case object Digit extends CharClassT("digit", "[0-9]") {
    def contains(c: Char): Boolean = c >= '0' && c <= '9'
    def sample: Seq[Char] = "0123456789"
  }
  case object Lower extends CharClassT("lower", "[a-z]") {
    def contains(c: Char): Boolean = c >= 'a' && c <= 'z'
    def sample: Seq[Char] = "abcdefghijklmnopqrstuvwxyz"
  }
  case object Upper extends CharClassT("upper", "[A-Z]") {
    def contains(c: Char): Boolean = c >= 'A' && c <= 'Z'
    def sample: Seq[Char] = "ABCDEFGHIJKLMNOPQRSTUVWXYZ"
  }
  case object Alpha extends CharClassT("alpha", "[a-zA-Z]") {
    def contains(c: Char): Boolean = Lower.contains(c) || Upper.contains(c)
    def sample: Seq[Char] = Lower.sample ++ Upper.sample
  }
  case object AlphaNum extends CharClassT("alnum", "[a-zA-Z0-9]") {
    def contains(c: Char): Boolean = Alpha.contains(c) || Digit.contains(c)
    def sample: Seq[Char] = Alpha.sample ++ Digit.sample
  }
  case object Space extends CharClassT("space", "[ \\t]") {
    def contains(c: Char): Boolean = c == ' ' || c == '\t'
    def sample: Seq[Char] = " "
  }
  case object AlphaNumSpace extends CharClassT("alnumspace", "[a-zA-Z0-9 \\t]") {
    def contains(c: Char): Boolean = AlphaNum.contains(c) || Space.contains(c)
    def sample: Seq[Char] = AlphaNum.sample :+ ' '
  }

  /** All classes, most specific first (the generalization order). */
  val all: Vector[CharClassT] =
    Vector(Bin01, Digit, Lower, Upper, Alpha, AlphaNum, Space, AlphaNumSpace)

  /** Most specific class containing `c`, if any (masks and exotic punctuation
    * have none).
    */
  def of(c: Char): Option[CharClassT] = all.find(_.contains(c))

  /** Least upper bound of two classes in the lattice. */
  def lub(a: CharClassT, b: CharClassT): CharClassT =
    if (a == b) a
    else all.find(g => all.indexOf(g) >= math.max(all.indexOf(a), all.indexOf(b)) &&
                       containsAll(g, a) && containsAll(g, b))
            .getOrElse(AlphaNumSpace)

  private def containsAll(g: CharClassT, s: CharClassT): Boolean =
    s.sample.forall(g.contains)
}
