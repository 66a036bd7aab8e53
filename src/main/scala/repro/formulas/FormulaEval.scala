package repro.formulas

/** Row-wise evaluator with Excel error semantics: any sub-expression error
  * propagates; the final outcome is either a rendered string or an error
  * code. This provides the per-row success/failure signal for
  * execution-guided repair (§3.6).
  */
object FormulaEval {

  type Out = Either[String, Value]

  /** Evaluate `e` for one row. `colOrder` resolves A1-style letter refs. */
  def eval(e: Expr, row: Map[String, String], colOrder: Vector[String]): Out = e match {
    case NumLit(d) => Right(VNum(d))
    case StrLit(s) => Right(VStr(s))
    case ColRef(n) =>
      row.get(n).map(cell).getOrElse(Left(Errors.Name))
    case LetterRef(ls) =>
      val idx = ls.foldLeft(0)((a, c) => a * 26 + (c - 'A' + 1)) - 1
      colOrder.lift(idx).flatMap(row.get).map(cell).getOrElse(Left(Errors.Name))
    case Neg(x) => num(eval(x, row, colOrder)).map(d => VNum(-d))
    case Bin(op, l, r) => binop(op, eval(l, row, colOrder), eval(r, row, colOrder))
    case Call(fn, args) => call(fn, args.map(eval(_, row, colOrder)))
  }

  /** Evaluate and render as a cell string (numbers drop a trailing `.0`). */
  def evalToCell(e: Expr, row: Map[String, String], colOrder: Vector[String]): String =
    eval(e, row, colOrder) match {
      case Left(err) => err
      case Right(v)  => render(v)
    }

  def render(v: Value): String = v match {
    case VNum(d)  => if (d == d.floor && !d.isInfinite && math.abs(d) < 1e15) d.toLong.toString else d.toString
    case VStr(s)  => s
    case VBool(b) => if (b) "TRUE" else "FALSE"
  }

  /** A cell read: error literals in cells propagate as errors. */
  private def cell(s: String): Out =
    if (Errors.isError(s)) Left(s) else Right(VStr(s))

  private def num(o: Out): Either[String, Double] = o.flatMap {
    case VNum(d)  => Right(d)
    case VBool(b) => Right(if (b) 1.0 else 0.0)
    case VStr(s)  =>
      val t = s.trim
      try Right(t.toDouble) catch { case _: NumberFormatException => Left(Errors.Value) }
  }

  private def str(o: Out): Either[String, String] = o.map {
    case VStr(s)  => s
    case v        => render(v)
  }

  private def bool(o: Out): Either[String, Boolean] = o.flatMap {
    case VBool(b) => Right(b)
    case VNum(d)  => Right(d != 0)
    case VStr(s)  => s.toUpperCase match {
      case "TRUE" => Right(true); case "FALSE" => Right(false); case _ => Left(Errors.Value)
    }
  }

  private def binop(op: String, l: Out, r: Out): Out = op match {
    case "&" => for (a <- str(l); b <- str(r)) yield VStr(a + b)
    case "+" => for (a <- num(l); b <- num(r)) yield VNum(a + b)
    case "-" => for (a <- num(l); b <- num(r)) yield VNum(a - b)
    case "*" => for (a <- num(l); b <- num(r)) yield VNum(a * b)
    case "/" => for (a <- num(l); b <- num(r); q <- if (b == 0) Left(Errors.Div0) else Right(a / b)) yield VNum(q)
    case "=" | "<>" | "<" | ">" | "<=" | ">=" =>
      for (a <- l; b <- r) yield VBool(compare(op, a, b))
    case _ => Left(Errors.Name)
  }

  private def compare(op: String, a: Value, b: Value): Boolean = {
    val c = (a, b) match {
      case (VNum(x), VNum(y)) => x.compare(y)
      case _                  => render(a).compareToIgnoreCase(render(b))
    }
    op match {
      case "="  => c == 0; case "<>" => c != 0
      case "<"  => c < 0;  case ">"  => c > 0
      case "<=" => c <= 0; case ">=" => c >= 0
    }
  }

  private def call(fn: String, args: Vector[Out]): Out = fn match {
    case "LEN"   => arg1s(args).map(s => VNum(s.length))
    case "UPPER" => arg1s(args).map(s => VStr(s.toUpperCase))
    case "LOWER" => arg1s(args).map(s => VStr(s.toLowerCase))
    case "TRIM"  => arg1s(args).map(s => VStr(s.trim.replaceAll(" +", " ")))
    case "VALUE" => args.headOption.map(num).getOrElse(Left(Errors.Value)).map(VNum)
    case "ABS"   => args.headOption.map(num).getOrElse(Left(Errors.Value)).map(d => VNum(math.abs(d)))
    case "ROUND" =>
      for (d <- num(args(0)); p <- if (args.size > 1) num(args(1)) else Right(0.0)) yield {
        val f = math.pow(10, p); VNum(math.round(d * f) / f)
      }
    case "LEFT" =>
      for (s <- str(args(0)); n <- optNum(args, 1, 1.0); r <- sliceLen(n)) yield VStr(s.take(r))
    case "RIGHT" =>
      for (s <- str(args(0)); n <- optNum(args, 1, 1.0); r <- sliceLen(n)) yield VStr(s.takeRight(r))
    case "MID" =>
      for {
        s  <- str(args(0)); st <- num(args(1)); n <- num(args(2))
        r  <- if (st < 1 || n < 0) Left(Errors.Value)
              else Right(s.drop(st.toInt - 1).take(n.toInt))
      } yield VStr(r)
    case "SEARCH" | "FIND" =>
      for {
        what  <- str(args(0)); in <- str(args(1)); st <- optNum(args, 2, 1.0)
        start <- if (st < 1) Left(Errors.Value) else Right(st.toInt - 1)
        idx = if (fn == "SEARCH") in.toLowerCase.indexOf(what.toLowerCase, start)
              else in.indexOf(what, start)
        r <- if (idx < 0) Left(Errors.Value) else Right(idx + 1)
      } yield VNum(r)
    case "CONCAT" | "CONCATENATE" =>
      args.foldLeft(Right(""): Either[String, String])((acc, a) =>
        for (x <- acc; s <- str(a)) yield x + s).map(VStr)
    case "SUBSTITUTE" =>
      for (s <- str(args(0)); o <- str(args(1)); n <- str(args(2)))
        yield VStr(if (o.isEmpty) s else s.replace(o, n))
    case "REPLACE" =>
      for (s <- str(args(0)); st <- num(args(1)); n <- num(args(2)); w <- str(args(3)))
        yield VStr(s.take(st.toInt - 1) + w + s.drop(st.toInt - 1 + n.toInt))
    case "IF" =>
      bool(args(0)).flatMap(c => if (c) args(1) else if (args.size > 2) args(2) else Right(VBool(false)))
    case "ISNUMBER" =>
      args(0) match {
        case Right(VNum(_)) => Right(VBool(true))
        case Right(_)       => Right(VBool(false))
        case Left(e)        => Left(e)
      }
    case "ISERROR" =>
      Right(VBool(args(0).isLeft))
    case _ => Left(Errors.Name)
  }

  private def arg1s(args: Vector[Out]): Either[String, String] =
    args.headOption.map(str).getOrElse(Left(Errors.Value))

  private def optNum(args: Vector[Out], idx: Int, default: Double): Either[String, Double] =
    if (args.size > idx) num(args(idx)) else Right(default)

  private def sliceLen(n: Double): Either[String, Int] =
    if (n < 0) Left(Errors.Value) else Right(n.toInt)
}
