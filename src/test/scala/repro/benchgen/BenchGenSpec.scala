package repro.benchgen

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class CorruptionsSpec extends AnyFunSuite {
  import Corruptions._

  test("char noise changes the value") {
    val r = new Random(1)
    for (_ <- 1 to 20) assert(CharNoise("abc123", r).exists(_ != "abc123"))
  }

  test("delim deletion removes a delimiter") {
    val r = new Random(2)
    val out = Iterator.continually(DelimNoise("a-b", r)).flatten.take(20).toVector
    assert(out.exists(_ == "ab"))
  }

  test("digit swap swaps adjacent digits") {
    val r = new Random(3)
    assert(DigitSwap("ab", r).isEmpty)
    assert(DigitSwap("11", r).isEmpty) // equal digits: no visible swap
    val s = DigitSwap("123", r).get
    assert(Set("213", "132").contains(s))
  }

  test("shuffle permutes characters") {
    val r = new Random(4)
    val s = Shuffle("abcdef", r).get
    assert(s != "abcdef" && s.sorted == "abcdef")
  }

  test("caps flips one letter's case") {
    val r = new Random(5)
    val s = Caps("abc", r).get
    assert(s.toLowerCase == "abc" && s != "abc")
  }

  test("decimal comma swap") {
    val r = new Random(6)
    assert(DecimalComma("1.5", r).contains("1,5"))
    assert(DecimalComma("1,5", r).contains("1.5"))
    assert(DecimalComma("ab", r).isEmpty)
  }

  test("visual typos use the paper's map") {
    val r = new Random(7)
    assert(VisualTypo("lot", r).exists(s => s == "1ot" || s == "l0t" || s == "lo7"))
    assert(VisualTypo("xyz", r).isEmpty)
  }

  test("corrupt returns None when nothing applies") {
    val r = new Random(8)
    assert(corrupt("", r, 4).isEmpty)
  }

  test("corrupt records applied ops and certainty") {
    val r = new Random(9)
    val cs = Iterator.continually(corrupt("abc-123", r, 1)).flatten.take(50).toVector
    assert(cs.forall(_.ops.size == 1))
    assert(cs.exists(_.certain) && cs.exists(!_.certain))
  }

  test("recoverability flags match the class definitions") {
    assert(DelimNoise.recoverable && Caps.recoverable && VisualTypo.recoverable && DecimalComma.recoverable)
    assert(!CharNoise.recoverable && !DigitSwap.recoverable && !Shuffle.recoverable)
  }

  test("determinism under a fixed seed") {
    val a = corrupt("hello-123", new Random(42), 2)
    val b = corrupt("hello-123", new Random(42), 2)
    assert(a == b)
  }
}

class ArchetypesSpec extends AnyFunSuite {

  test("every archetype generates values accepted by its own validator") {
    val rng = new Random(0)
    for (a <- Archetypes.all) {
      val vs = a.gen(rng, 30)
      assert(vs.size == 30)
      assert(vs.forall(a.valid), s"${a.name}: ${vs.filterNot(a.valid).take(3)}")
    }
  }

  test("semantic archetypes produce KB-recognizable substrings") {
    val rng = new Random(1)
    for (a <- Archetypes.all if a.semantic) {
      val masked = repro.semantics.SemanticMasker.maskColumn(a.gen(rng, 20))
      assert(masked.count(_.isMasked) >= 10, s"${a.name} should mask")
    }
  }

  test("regular archetypes yield significant patterns for DataVinci") {
    val rng = new Random(2)
    for (a <- Archetypes.regular) {
      val t = repro.core.Table.of("c" -> a.gen(rng, 25))
      val res = repro.core.DataVinci.cleanColumn(t, 0)
      assert(res.significant.nonEmpty, a.name)
    }
  }

  test("validators reject corrupted values most of the time") {
    val rng = new Random(3)
    var rejected = 0; var total = 0
    for (a <- Archetypes.regular; v <- a.gen(rng, 10)) {
      Corruptions.corrupt(v, rng, 2).foreach { c =>
        total += 1; if (!a.valid(c.dirty)) rejected += 1
      }
    }
    assert(rejected.toDouble / total > 0.6)
  }

  test("byName covers all") {
    assert(Archetypes.byName.size == Archetypes.all.size)
  }
}

class BenchGenSpec extends AnyFunSuite {

  test("wikipedia tables have paper-like shape") {
    val t = BenchGen.wikipedia(7)
    assert(t.colNames.size >= 4 && t.colNames.size <= 6)
    assert(t.nRows >= 20 && t.nRows <= 35)
    assert(t.cells.size == t.colNames.size * t.nRows)
  }

  test("generation is deterministic in the id") {
    assert(BenchGen.wikipedia(3) == BenchGen.wikipedia(3))
    assert(BenchGen.excel(5) == BenchGen.excel(5))
    assert(BenchGen.synthetic(9) == BenchGen.synthetic(9))
    assert(BenchGen.formulas(11) == BenchGen.formulas(11))
  }

  test("dirty and clean tables differ exactly on error cells") {
    val t = BenchGen.synthetic(1)
    val dirty = t.dirtyTable; val clean = t.cleanTable
    for (cell <- t.cells) {
      val d = dirty.col(cell.col).values(cell.row)
      val c = clean.col(cell.col).values(cell.row)
      assert(d == cell.dirty && c == cell.clean)
      if (cell.isError) assert(d != c) else assert(d == c)
    }
  }

  test("synthetic corruption rate is near 20%") {
    val ts = (0 until 20).map(BenchGen.synthetic(_))
    val cells = ts.flatMap(_.cells)
    val rate = cells.count(_.isError).toDouble / cells.size
    assert(rate > 0.10 && rate < 0.25, s"rate=$rate")
  }

  test("excel tables are long and narrow") {
    val t = BenchGen.excel(2)
    assert(t.colNames.size <= 2 && t.nRows >= 120)
  }

  test("formula tables parse, evaluate, and sit in the failing-rate gate") {
    for (id <- 0L until 12L) {
      val t = BenchGen.formulas(id)
      assert(t.formula.nonEmpty && t.inputCols.nonEmpty)
      val failing = BenchGen.failingRows(t)
      assert(failing.nonEmpty, s"table $id has no failing rows")
      assert(failing.size < t.nRows / 2, s"table $id fails too much")
    }
  }

  test("formula benchmark mixes single and multi column inputs") {
    val ts = (0L until 40L).map(BenchGen.formulas)
    assert(ts.exists(_.inputCols.size == 1))
    assert(ts.exists(_.inputCols.size > 1))
  }

  test("errorRows matches the cell flags") {
    val t = BenchGen.wikipedia(1)
    for (c <- t.colNames.indices)
      assert(t.errorRows(c) == t.cells.filter(x => x.col == c && x.isError).map(_.row).toSet)
  }
}
