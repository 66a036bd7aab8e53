package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Table

class LlmRepairSpec extends AnyFunSuite {

  test("frequent neighbour snaps close rare values") {
    val t = Table.of("c" -> Seq("BUILDING", "BUILDING", "BULDING", "MACHINERY", "MACHINERY"))
    assert(LlmRepair.repair(t, 0, 2).contains("BUILDING"))
  }

  test("semantic fix canonicalizes a misspelled entity") {
    val t = Table.of("c" -> Seq("Birmingham", "London", "Boston", "Hampton", "Birminxham"))
    assert(LlmRepair.repair(t, 0, 4).contains("Birmingham"))
  }

  test("template transfer reshapes punctuation to the dominant format") {
    val t = Table.of("c" -> Seq("937-587-3389", "419-996-7110", "440-993-8351",
                                "(937) 509 6413", "202-555-0101"))
    assert(LlmRepair.repair(t, 0, 3).contains("937-509-6413"))
  }

  test("returns None when no signal applies") {
    val t = Table.of("c" -> Seq("qqq1", "www2", "eee3", "zzzzzzz9999"))
    assert(LlmRepair.repair(t, 0, 3).isEmpty)
  }
}

class BaselineBehaviourSpec extends AnyFunSuite {

  private val categorical = Table.of(
    "seg"  -> Seq("BUILDING", "AUTOMOBILE", "BUILDING", "MACHINERY", "BUILDING",
                  "AUTOMOBILE", "BULDING", "MACHINERY", "BUILDING", "AUTOMOBILE"),
    "code" -> Seq("B1", "A1", "B1", "M1", "B1", "A1", "B1", "M1", "B1", "A1"),
  )

  test("WMRR rectifies a rare close value intra-column") {
    val out = new Wmrr().clean(categorical)(0)
    assert(out.errors.contains(6))
    assert(out.repairs.get(6).contains("BUILDING"))
  }

  test("WMRR learns inter-column FD rules") {
    val t = Table.of(
      "a" -> Seq("x", "x", "x", "x", "x", "y", "y", "y", "y"),
      "b" -> Seq("1", "1", "1", "1", "9", "2", "2", "2", "2"),
    )
    val out = new Wmrr().clean(t)(1)
    assert(out.errors.contains(4))
    assert(out.repairs.get(4).contains("1"))
  }

  test("WMRR misses format errors in all-distinct columns") {
    val t = Table.of("p" -> Seq("937-587-3389", "419-996-7110", "4405764039", "555-123-4567"))
    assert(new Wmrr().clean(t)(0).errors.isEmpty)
  }

  test("HoloClean repairs a singleton against co-occurrence evidence") {
    val out = new HoloCleanLite().clean(categorical)(0)
    assert(out.errors.contains(6))
    assert(out.repairs.get(6).contains("BUILDING"))
  }

  test("HoloClean stays silent on free-format strings") {
    val t = Table.of("p" -> Seq("937-587-3389", "419-996-7110", "4405764039"))
    assert(new HoloCleanLite().clean(t)(0).errors.isEmpty)
  }

  test("Raha propagates labels through clusters") {
    val t = Table.of("c" -> Seq("a-1", "a-2", "a-3", "a-4", "a-5", "a-6", "a_7", "a_8"))
    val out = new Raha().cleanWithLabels(t, Map(0 -> Set(6)))
    assert(out(0).errors.contains(6))
    assert(out(0).errors.contains(7)) // same detector vector cluster
  }

  test("Raha without labels falls back to ensemble voting") {
    val t = Table.of("c" -> Seq("a-1", "a-2", "a-3", "a-4", "a-5", "a-6", "", "a-8"))
    assert(new Raha().clean(t)(0).errors.contains(6))
  }

  test("Auto-Detect flags incompatible pattern outliers") {
    val t = Table.of("t" -> Seq("04:34", "05:23", "04:38", "03.45", "03:34", "04:55"))
    val out = new AutoDetect().clean(t)(0)
    assert(out.errors == Set(3))
  }

  test("Auto-Detect respects compatible pattern pairs") {
    val t = Table.of("n" -> Seq("12", "34", "5.6", "78", "90", "11", "23", "45", "67", "89"))
    assert(new AutoDetect().clean(t)(0).errors.isEmpty) // D vs D.D are compatible
  }

  test("Potter's Wheel infers structure and flags non-conforming values") {
    val t = Table.of("t" -> Seq("04:34", "05:23", "04:38", "03.45", "03:34", "04:55"))
    assert(new PottersWheel().clean(t)(0).errors == Set(3))
  }

  test("T5 over-fires relative to ground truth") {
    val t = Table.of("c" -> Seq("alpha-1", "alpha-2", "alpha-3", "alpha-4", "beta!99",
                                "alpha-5", "alpha-6", "alpha-7"))
    val out = new T5Sim().clean(t)(0)
    assert(out.errors.nonEmpty)
  }

  test("GPT-3.5 sim catches semantic typos") {
    val t = Table.of("c" -> Seq("Birmingham", "London", "Boston", "Hampton", "Birminxham"))
    val out = new Gpt35Sim().clean(t)(0)
    assert(out.errors.contains(4))
    assert(out.repairs.get(4).contains("Birmingham"))
  }

  test("GPT-3.5 sim misses the S1.4 syntactic pattern (§5.1)") {
    val t = Table.of("c" -> Seq("S.1.2", "S.2.3", "S1.4", "S.1.3", "S.2.1"))
    assert(new Gpt35Sim().clean(t)(0).errors.isEmpty)
  }

  test("GPT-3.5 sim flags style deviations of elected entities") {
    val t = Table.of("c" -> Seq("US-1", "UK-2", "FR-3", "usa-4", "DE-5"))
    assert(new Gpt35Sim().clean(t)(0).errors.contains(3))
  }

  test("all systems construct through the registry") {
    for (n <- repro.benchgen.Systems.all) {
      assert(repro.benchgen.Systems.make(n).name == n)
    }
  }
}
