package repro.formulas

/** AST of the Excel-formula fragment used by the execution-guided benchmark.
  *
  * Column references come in two forms: structured (`[@ColName]`) and
  * A1-style letters (`A48` — resolved to the table column by letter, with the
  * row implied by row-wise evaluation, matching the paper's
  * column-transformation programs of §3.6).
  */
sealed trait Expr
final case class NumLit(d: Double)                      extends Expr
final case class StrLit(s: String)                      extends Expr
final case class ColRef(name: String)                   extends Expr
final case class LetterRef(letters: String)             extends Expr
final case class Call(fn: String, args: Vector[Expr])   extends Expr
final case class Bin(op: String, l: Expr, r: Expr)      extends Expr
final case class Neg(e: Expr)                           extends Expr

/** Runtime values. */
sealed trait Value
final case class VNum(d: Double)   extends Value
final case class VStr(s: String)   extends Value
final case class VBool(b: Boolean) extends Value

/** Excel-style error codes — the failure signal execution-guided repair
  * partitions on.
  */
object Errors {
  val Value   = "#VALUE!"
  val Div0    = "#DIV/0!"
  val Name    = "#NAME?"
  val NA      = "#N/A"
  /** True for any Excel error literal. */
  def isError(s: String): Boolean = s.startsWith("#")
}
