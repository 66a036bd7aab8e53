package repro.core.repair

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Table
import repro.core.repair.Predicates.Feature

class DecisionTreeSpec extends AnyFunSuite {

  private def feat(name: String, bits: Boolean*) = Feature(name, bits.toArray)

  test("pure labels learn a single leaf") {
    val f = Vector(feat("a", true, false, true))
    val t = DecisionTree.learn(f, Vector((0, "X"), (1, "X"), (2, "X"))).get
    assert(t == DecisionTree.Leaf("X"))
    assert(t.nodes == 1 && t.depth == 0)
  }

  test("majority leaf suffices at alpha 0.8") {
    val f  = Vector(feat("a", true, false, true, true, true))
    val ex = Vector((0, "X"), (1, "Y"), (2, "X"), (3, "X"), (4, "X"))
    val t  = DecisionTree.learn(f, ex).get
    assert(t == DecisionTree.Leaf("X")) // 4/5 = 0.8 ≥ α
  }

  test("depth-1 stump separates on a single predicate (Fig-2 CAT/PRO)") {
    val isPro = feat("equals(Category,Professional)", true, false, true, false)
    val ex    = Vector((0, "PRO"), (1, "CAT"), (2, "PRO"), (3, "CAT"))
    val t     = DecisionTree.learn(Vector(isPro), ex).get
    assert(t.depth == 1 && t.nodes == 3)
    assert(t.predict(0, Vector(isPro)) == "PRO")
    assert(t.predict(1, Vector(isPro)) == "CAT")
  }

  test("stump picks the best of several features") {
    val noise = feat("noise", true, true, false, false)
    val good  = feat("good", true, false, true, false)
    val ex    = Vector((0, "A"), (1, "B"), (2, "A"), (3, "B"))
    val t     = DecisionTree.learn(Vector(noise, good), ex).get
    assert(t.asInstanceOf[DecisionTree.Node].feat == 1)
  }

  test("depth-2 tree handles xor-like labels") {
    val f1 = feat("f1", true, true, false, false)
    val f2 = feat("f2", true, false, true, false)
    val ex = Vector((0, "A"), (1, "B"), (2, "B"), (3, "A"))
    val t  = DecisionTree.learn(Vector(f1, f2), ex).get
    assert(ex.forall { case (r, l) => t.predict(r, Vector(f1, f2)) == l })
    assert(t.depth == 2)
  }

  test("no qualifying tree returns None") {
    // labels uncorrelated with the only feature and no majority
    val f  = Vector(feat("a", true, true, true, false, false, false))
    val ex = Vector((0, "A"), (1, "B"), (2, "C"), (3, "D"), (4, "E"), (5, "F"))
    assert(DecisionTree.learn(f, ex).isEmpty)
  }

  test("empty examples return None") {
    assert(DecisionTree.learn(Vector(feat("a", true)), Vector.empty).isEmpty)
  }

  test("tie-break on label order is deterministic") {
    val f  = Vector(feat("a", true, false))
    val t1 = DecisionTree.learn(f, Vector((0, "A"), (1, "B")), alpha = 0.4).get
    val t2 = DecisionTree.learn(f, Vector((0, "A"), (1, "B")), alpha = 0.4).get
    assert(t1 == t2)
  }
}

class PredicatesSpec extends AnyFunSuite {

  test("token split on non-alphanumeric, case change and alpha-digit switch") {
    assert(Predicates.tokensOf("Ind-674-PRO").toSet.contains("Ind"))
    assert(Predicates.tokensOf("Ind-674-PRO").toSet.contains("674"))
    assert(Predicates.tokensOf("Ind-674-PRO").toSet.contains("PRO"))
    assert(Predicates.tokensOf("Chrome23").toSet == Set("Chrome", "23"))
    assert(Predicates.tokensOf("fooBar").contains("foo"))
  }

  test("constant features are dropped") {
    val t = Table.of("c" -> Seq("x-1", "x-2", "x-3"))
    val fs = Predicates.featuresOf(t)
    // contains(c,-) is true for all rows → dropped
    assert(!fs.exists(_.name == "contains(c,-)"))
  }

  test("informative equals features are generated") {
    val t  = Table.of("cat" -> Seq("Junior", "Professional", "Junior", "Professional"))
    val fs = Predicates.featuresOf(t)
    val eq = fs.find(_.name == "equals(cat,Junior)").get
    assert(eq.values.toSeq == Seq(true, false, true, false))
  }

  test("features span all columns") {
    val t  = Table.of("a" -> Seq("1", "2"), "b" -> Seq("x", "y"))
    val fs = Predicates.featuresOf(t)
    assert(fs.exists(_.name.contains("(a,")))
    assert(fs.exists(_.name.contains("(b,")))
  }

  test("length feature uses frequent lengths") {
    val t  = Table.of("c" -> Seq("aa", "bb", "ccc"))
    val fs = Predicates.featuresOf(t)
    assert(fs.exists(_.name == "length(c,2)"))
  }

  test("hasDigits / isNum / isNA behave") {
    val t  = Table.of("c" -> Seq("12", "ab", "n/a"))
    val fs = Predicates.featuresOf(t)
    assert(fs.find(_.name == "hasDigits(c)").get.values.toSeq == Seq(true, false, false))
    assert(fs.find(_.name == "isNum(c)").get.values.toSeq == Seq(true, false, false))
    assert(fs.find(_.name == "isNA(c)").get.values.toSeq == Seq(false, false, true))
  }
}
