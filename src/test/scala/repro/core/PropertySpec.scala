package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.core.pattern._
import repro.core.repair.{Dag, EditDp}

/** Property-based invariants of the pattern/repair substrate (raw
  * ScalaCheck — scalatestplus is not on the offline classpath).
  */
class PropertySpec extends AnyFunSuite {

  private def checkProp(p: Prop, n: Int = 80): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(n), p)
    assert(res.passed, res.status.toString)
  }

  private val simpleString: Gen[String] =
    Gen.chooseNum(0, 10).flatMap(n =>
      Gen.listOfN(n, Gen.oneOf(Gen.alphaNumChar, Gen.oneOf('-', '_', '.', ':', ' '))).map(_.mkString))

  private val patterns: Gen[Pattern] = Gen.oneOf(
    Pattern(Lit("QUAL"), Lit("-"), Cls(CharClassT.Digit, Some(2))),
    Pattern(Cls(CharClassT.Upper, Some(2)), Lit("-"), Cls(CharClassT.Digit, None)),
    Pattern(Cls(CharClassT.Digit, None)),
    Pattern(Group(Vector(Lit("A"), Cls(CharClassT.Digit, Some(1)), Lit(".")))),
    Pattern(Disj(Vector("CAT", "PRO")), Lit("-"), Cls(CharClassT.Digit, Some(1))),
    Pattern(Lit("v"), Cls(CharClassT.Digit, None), Lit("."), Cls(CharClassT.Digit, None)),
  )

  /** Resolve abstract units with the first class/alternative candidate. */
  private def naive(r: repro.core.repair.AbstractRepair): String =
    r.emitted.map {
      case repro.core.repair.EChar(c)        => c.toString
      case repro.core.repair.ECls(cc, _, _) => cc.sample.head.toString
      case repro.core.repair.EMask(t, _, _)  => Masks.charFor(t).toString
      case repro.core.repair.EDisj(_, _, as) => as.head
    }.mkString

  test("minimal repairs always land in the pattern language") {
    checkProp(Prop.forAll(patterns, simpleString) { (p, s) =>
      EditDp.minimalRepair(Dag.build(p, s.length), s).forall(r => p.matches(naive(r)))
    })
  }

  test("values already in the language repair at cost zero") {
    checkProp(Prop.forAll(patterns, simpleString) { (p, s) =>
      !p.matches(s) || EditDp.minimalRepair(Dag.build(p, s.length), s).exists(_.cost == 0)
    })
  }

  test("repair cost is bounded by delete-all + insert-result") {
    checkProp(Prop.forAll(patterns, simpleString) { (p, s) =>
      EditDp.minimalRepair(Dag.build(p, s.length), s).forall { r =>
        r.cost <= s.length + naive(r).length
      }
    })
  }

  test("repair cost never exceeds Levenshtein to the resolved repair") {
    checkProp(Prop.forAll(patterns, simpleString) { (p, s) =>
      EditDp.minimalRepair(Dag.build(p, s.length), s).forall { r =>
        r.cost <= Strings.lev(s, naive(r))
      }
    })
  }

  test("pattern matching is anchored like its compiled regex") {
    checkProp(Prop.forAll(patterns, simpleString) { (p, s) =>
      p.matches(s) == s.matches(p.regex)
    })
  }

  test("learner always covers every input value") {
    val colGen = Gen.chooseNum(1, 12).flatMap(n => Gen.listOfN(n, simpleString.suchThat(_.nonEmpty)))
    checkProp(Prop.forAll(colGen) { vs =>
      val lp = PatternLearner.learn(vs.toVector)
      vs.forall(v => lp.patterns.exists(_._1.matches(v)))
    }, n = 50)
  }

  test("levenshtein is a metric on samples") {
    checkProp(Prop.forAll(simpleString, simpleString, simpleString) { (a, b, c) =>
      Strings.lev(a, b) == Strings.lev(b, a) &&
        Strings.lev(a, a) == 0 &&
        Strings.lev(a, c) <= Strings.lev(a, b) + Strings.lev(b, c)
    })
  }

  test("corruption never silently returns the same value") {
    val g = for {
      s    <- simpleString.suchThat(_.nonEmpty)
      seed <- Gen.chooseNum(0L, 10000L)
      n    <- Gen.chooseNum(1, 4)
    } yield (s, seed, n)
    checkProp(Prop.forAll(g) { case (s, seed, n) =>
      repro.benchgen.Corruptions.corrupt(s, new scala.util.Random(seed), n)
        .forall(_.dirty != s)
    })
  }
}
