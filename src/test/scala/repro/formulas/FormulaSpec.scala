package repro.formulas

import org.scalatest.funsuite.AnyFunSuite

class FormulaParserSpec extends AnyFunSuite {

  private def p(s: String): Expr = FormulaParser.parse(s).fold(e => fail(e), identity)

  test("number / string / ref atoms") {
    assert(p("42") == NumLit(42))
    assert(p("\"hi\"") == StrLit("hi"))
    assert(p("[@col1]") == ColRef("col1"))
    assert(p("A48") == LetterRef("A"))
    assert(p("Option") == ColRef("Option"))
  }

  test("doubled quotes escape") {
    assert(p("\"a\"\"b\"") == StrLit("a\"b"))
  }

  test("leading equals sign is stripped") {
    assert(p("=1+2") == Bin("+", NumLit(1), NumLit(2)))
  }

  test("precedence: mul over add over concat over comparison") {
    assert(p("1+2*3") == Bin("+", NumLit(1), Bin("*", NumLit(2), NumLit(3))))
    assert(p("\"a\"&1+2") == Bin("&", StrLit("a"), Bin("+", NumLit(1), NumLit(2))))
    assert(p("1+2=3") == Bin("=", Bin("+", NumLit(1), NumLit(2)), NumLit(3)))
  }

  test("parentheses override precedence") {
    assert(p("(1+2)*3") == Bin("*", Bin("+", NumLit(1), NumLit(2)), NumLit(3)))
  }

  test("unary minus") {
    assert(p("-3") == Neg(NumLit(3)))
    assert(p("1--3") == Bin("-", NumLit(1), Neg(NumLit(3))))
  }

  test("function calls with nested args") {
    assert(p("""SEARCH("-",[@c])""") == Call("SEARCH", Vector(StrLit("-"), ColRef("c"))))
    assert(p("LEN(A1)") == Call("LEN", Vector(LetterRef("A"))))
  }

  test("the paper's Fig-8 formula parses") {
    val f = p("""=RIGHT(A48, LEN(A48) - SEARCH("Chrome",A48) - LEN("Chrome") + 1)""")
    assert(f.isInstanceOf[Call])
    assert(f.asInstanceOf[Call].fn == "RIGHT")
  }

  test("comparison operators") {
    assert(p("1<>2") == Bin("<>", NumLit(1), NumLit(2)))
    assert(p("1<=2") == Bin("<=", NumLit(1), NumLit(2)))
  }

  test("trailing garbage is rejected") {
    assert(FormulaParser.parse("1 2").isLeft)
    assert(FormulaParser.parse("SEARCH(").isLeft)
  }
}

class FormulaEvalSpec extends AnyFunSuite {

  private val row   = Map("c" -> "US-837", "d" -> "42", "e" -> "Chrome23")
  private val order = Vector("c", "d", "e")

  private def run(s: String, r: Map[String, String] = row): String =
    FormulaEval.evalToCell(FormulaParser.parse(s).toOption.get, r, order)

  test("arithmetic") {
    assert(run("1+2*3") == "7")
    assert(run("(1+2)/2") == "1.5")
    assert(run("-3+5") == "2")
  }

  test("division by zero") { assert(run("1/0") == Errors.Div0) }

  test("string functions") {
    assert(run("LEN([@c])") == "6")
    assert(run("UPPER(\"ab\")") == "AB")
    assert(run("LOWER(\"AB\")") == "ab")
    assert(run("TRIM(\"  a  b \")") == "a b")
    assert(run("LEFT([@c],2)") == "US")
    assert(run("RIGHT([@c],3)") == "837")
    assert(run("MID([@c],4,3)") == "837")
    assert(run("CONCAT(\"a\",1,\"b\")") == "a1b")
    assert(run("SUBSTITUTE([@c],\"-\",\"_\")") == "US_837")
  }

  test("SEARCH is case-insensitive and 1-based; FIND is case-sensitive") {
    assert(run("SEARCH(\"us\",[@c])") == "1")
    assert(run("SEARCH(\"-\",[@c])") == "3")
    assert(run("FIND(\"us\",[@c])") == Errors.Value)
    assert(run("FIND(\"US\",[@c])") == "1")
  }

  test("SEARCH miss is an error — the §1 motivating example") {
    assert(run("SEARCH(\"-\",\"c3\")") == Errors.Value)
    assert(run("SEARCH(\"-\",\"c-3\")") == "2")
  }

  test("VALUE coerces or errors") {
    assert(run("VALUE([@d])") == "42")
    assert(run("VALUE(\"3.5\")+1") == "4.5")
    assert(run("VALUE([@c])") == Errors.Value)
  }

  test("the Fig-8 formula over clean and dirty values") {
    val f = """=RIGHT(A1, LEN(A1) - SEARCH("Chrome",A1) - LEN("Chrome") + 1)"""
    assert(run(f, Map("c" -> "Chrome23")) == "23")
    assert(run(f, Map("c" -> "C30")) == Errors.Value)
  }

  test("letter refs resolve by column order") {
    assert(run("LEN(B1)") == "2")  // column d = "42"
    assert(run("LEN(C9)") == "8")  // column e = "Chrome23"
    assert(run("LEN(Z1)") == Errors.Name)
  }

  test("IF / ISNUMBER / ISERROR") {
    assert(run("IF(1<2,\"y\",\"n\")") == "y")
    assert(run("ISNUMBER(VALUE([@d]))") == "TRUE")
    assert(run("ISNUMBER([@c])") == "FALSE")
    assert(run("ISERROR(VALUE([@c]))") == "TRUE")
    assert(run("ISERROR(1)") == "FALSE")
  }

  test("error propagation through operators and calls") {
    assert(run("1+VALUE([@c])") == Errors.Value)
    assert(run("LEN(VALUE([@c]))") == Errors.Value)
    assert(run("CONCAT(\"a\",VALUE([@c]))") == Errors.Value)
  }

  test("error literals in cells propagate") {
    assert(run("LEN([@c])", Map("c" -> "#DIV/0!")) == "#DIV/0!")
  }

  test("concat operator renders numbers like cells") {
    assert(run("\"n=\"&(1+1)") == "n=2")
  }

  test("ROUND and ABS") {
    assert(run("ROUND(2.345,2)") == "2.35")
    assert(run("ABS(-3)") == "3")
  }

  test("MID with bad bounds errors") {
    assert(run("MID([@c],0,2)") == Errors.Value)
    assert(run("MID([@c],2,-1)") == Errors.Value)
  }

  test("unknown function yields #NAME?") {
    assert(run("NOSUCH(1)") == Errors.Name)
  }

  test("unknown column yields #NAME?") {
    assert(run("[@nope]") == Errors.Name)
  }
}
