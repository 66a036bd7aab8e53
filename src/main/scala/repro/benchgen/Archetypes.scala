package repro.benchgen

import repro.semantics.SemanticKB
import scala.util.Random

/** Column archetypes: clean-value generators with latent-language
  * validators. These stand in for the paper's Wikipedia/Excel corpora
  * (released only as preparation scripts, not data) and deliberately cover
  * the error classes discussed in the paper: purely syntactic formats
  * (phones, serials, versions), purely semantic values (city names), mixed
  * syntactic+semantic formats (country-code IDs, name+id), and irregular
  * columns with no learnable pattern (the Fig.-6 failure mode).
  *
  * `valid` checks membership in the latent regular language — the judge for
  * "possible" (reasonable but not uniquely determined) repairs.
  */
final case class Archetype(
    name: String,
    semantic: Boolean,
    irregular: Boolean,
    gen: (Random, Int) => Vector[String],
    valid: String => Boolean,
)

object Archetypes {

  private def ents(t: String): Vector[repro.semantics.Entity] = SemanticKB.entities(t)
  private def pick[A](rng: Random, xs: Vector[A]): A = xs(rng.nextInt(xs.size))

  private val words = Vector("alpha", "delta", "gamma", "omega", "nova", "terra",
    "vega", "luna", "zephyr", "atlas", "orion", "pluto", "quartz", "ember")

  private def digits(rng: Random, n: Int): String =
    Vector.fill(n)(rng.nextInt(10)).mkString

  val phone: Archetype = Archetype("phone", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"${100 + rng.nextInt(900)}-${100 + rng.nextInt(900)}-${1000 + rng.nextInt(9000)}"),
    valid = _.matches("[0-9]{3}-[0-9]{3}-[0-9]{4}"))

  /** `US-837` style: country code2 + numeric id — mixed semantic/syntactic.
    * ~12% of clean cells legitimately use a title-case code3 rendering
    * (`Ind-674`, the Fig-2 data shape): semantic masking absorbs the
    * variant, purely syntactic systems flag it as an outlier.
    */
  val countryCodeId: Archetype = Archetype("countryCodeId", semantic = true, irregular = false,
    gen = (rng, n) => {
      val cs = ents("country")
      Vector.fill(n) {
        val e = pick(rng, cs)
        if (rng.nextDouble() < 0.12) {
          val c3 = e.form("code3").get
          s"${c3.head}${c3.tail.toLowerCase}-${100 + rng.nextInt(900)}"
        } else s"${e.form("code2").get}-${100 + rng.nextInt(900)}"
      }
    },
    valid = v => {
      val parts = v.split("-", 2)
      parts.length == 2 && parts(1).matches("[0-9]{3}") &&
        SemanticKB.index.get(SemanticKB.normalize(parts(0))).exists(_.exists(_._1.semType == "country"))
    })

  /** Fig.-2 Player-ID style: `Ind-674-PRO` / `QUAL-21` rows mixed. */
  val playerId: Archetype = Archetype("playerId", semantic = true, irregular = false,
    gen = (rng, n) => {
      val cs = ents("country")
      Vector.fill(n) {
        if (rng.nextDouble() < 0.32) s"QUAL-${10 + rng.nextInt(90)}"
        else {
          val cat = if (rng.nextBoolean()) "PRO" else "CAT"
          s"${pick(rng, cs).form("code3").get}-${100 + rng.nextInt(900)}-$cat"
        }
      }
    },
    valid = v => v.matches("[A-Z]{2,4}-[0-9]{2,3}(-(PRO|CAT))?"))

  val url: Archetype = Archetype("url", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"https://www.${pick(rng, words)}.com"),
    valid = _.matches("https://www\\.[a-z]+\\.com"))

  val timeMMSS: Archetype = Archetype("timeMMSS", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(f"${rng.nextInt(60)}%02d:${rng.nextInt(60)}%02d"),
    valid = _.matches("[0-9]{2}:[0-9]{2}"))

  val quarter: Archetype = Archetype("quarter", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"Q${1 + rng.nextInt(4)}-20${10 + rng.nextInt(15)}"),
    valid = _.matches("Q[1-4]-20[0-9]{2}"))

  /** `47 (7.55%)` style from the Wikipedia "Mixing" column. */
  val percentPair: Archetype = Archetype("percentPair", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"${10 + rng.nextInt(90)} (${rng.nextInt(10)}.${10 + rng.nextInt(90)}%)"),
    valid = _.matches("[0-9]{1,3} \\([0-9]+\\.[0-9]{2}%\\)"))

  val city: Archetype = Archetype("city", semantic = true, irregular = false,
    gen = (rng, n) => Vector.fill(n)(pick(rng, ents("city")).canonical),
    valid = v => SemanticKB.index.get(SemanticKB.normalize(v)).exists(_.exists(_._1.semType == "city")))

  val colorQty: Archetype = Archetype("colorQty", semantic = true, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"${pick(rng, ents("color")).canonical} ${1 + rng.nextInt(99)}"),
    valid = v => {
      val parts = v.split(" ", 2)
      parts.length == 2 && parts(1).matches("[0-9]{1,2}") &&
        SemanticKB.index.get(SemanticKB.normalize(parts(0))).exists(_.exists(_._1.semType == "color"))
    })

  /** `John102` style: first name + numeric id, no delimiter. */
  val nameId: Archetype = Archetype("nameId", semantic = true, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"${pick(rng, ents("name")).canonical}${100 + rng.nextInt(900)}"),
    valid = v => {
      val (a, d) = v.span(_.isLetter)
      d.matches("[0-9]{3}") && SemanticKB.index.get(SemanticKB.normalize(a)).exists(_.exists(_._1.semType == "name"))
    })

  /** `S.1.2` serials — the GPT-3.5 failure example of §5.1. */
  val serialDotted: Archetype = Archetype("serialDotted", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"S.${1 + rng.nextInt(4)}.${1 + rng.nextInt(6)}"),
    valid = _.matches("S\\.[0-9]\\.[0-9]"))

  /** `Chrome23` — the Fig.-8 browser-version column. */
  val chromeVer: Archetype = Archetype("chromeVer", semantic = true, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"Chrome${15 + rng.nextInt(20)}"),
    valid = _.matches("Chrome[0-9]{2}"))

  val versionStr: Archetype = Archetype("versionStr", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(s"v${1 + rng.nextInt(9)}.${rng.nextInt(10)}.${rng.nextInt(20)}"),
    valid = _.matches("v[0-9]\\.[0-9]\\.[0-9]{1,2}"))

  val money: Archetype = Archetype("money", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(f"$$${1 + rng.nextInt(9)},${rng.nextInt(1000)}%03d.${rng.nextInt(100)}%02d"),
    valid = _.matches("\\$[0-9],[0-9]{3}\\.[0-9]{2}"))

  val isoDate: Archetype = Archetype("isoDate", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(f"20${rng.nextInt(26)}%02d-${1 + rng.nextInt(12)}%02d-${1 + rng.nextInt(28)}%02d"),
    valid = _.matches("20[0-9]{2}-[0-9]{2}-[0-9]{2}"))

  /** `CA_123` state-abbreviation IDs; ~10% of clean cells use the full
    * state name (`California_123`) — absorbed by masking, an outlier to
    * syntactic systems.
    */
  val stateCode: Archetype = Archetype("stateCode", semantic = true, irregular = false,
    gen = (rng, n) => {
      val ss = ents("state")
      Vector.fill(n) {
        val e = pick(rng, ss)
        val surface = if (rng.nextDouble() < 0.10) e.form("name").get else e.form("abbr").get
        s"${surface}_${100 + rng.nextInt(900)}"
      }
    },
    valid = v => {
      val idx = v.lastIndexOf('_')
      idx > 0 && v.substring(idx + 1).matches("[0-9]{3}") &&
        SemanticKB.index.get(SemanticKB.normalize(v.substring(0, idx))).exists(_.exists(_._1.semType == "state"))
    })

  /** Categorical column with few distinct values (mktsegment-like). */
  val categorical: Archetype = Archetype("categorical", semantic = false, irregular = false,
    gen = (rng, n) => {
      val domain = Vector("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE")
      Vector.fill(n)(pick(rng, domain))
    },
    valid = Vector("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE").contains)

  val plainNumber: Archetype = Archetype("plainNumber", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)((100 + rng.nextInt(9900)).toString),
    valid = _.matches("[0-9]{3,4}"))

  /** Irregular free text: no learnable pattern (Fig.-6 failure mode ②). */
  val freeText: Archetype = Archetype("freeText", semantic = false, irregular = true,
    gen = (rng, n) => Vector.fill(n) {
      val k = 2 + rng.nextInt(4)
      Vector.fill(k)(pick(rng, words)).mkString(rng.nextInt(3) match {
        case 0 => " "; case 1 => ", "; case _ => " - "
      })
    },
    valid = _ => true)

  /** Measurement column with a legitimate minority spacing variant
    * (`12 kg` vs `12kg` at ~8%) — the Excel-corpus heterogeneity that
    * produces false positives for every pattern-outlier detector, DataVinci
    * included (its δ-threshold treats an 8% format as an outlier), keeping
    * Excel detection harder than Wikipedia as in the paper.
    */
  val measureMixed: Archetype = Archetype("measureMixed", semantic = false, irregular = true,
    gen = (rng, n) => Vector.fill(n) {
      val unit = pick(rng, Vector("kg", "cm", "ml"))
      val qty  = 1 + rng.nextInt(99)
      if (rng.nextDouble() < 0.08) s"$qty$unit" else s"$qty $unit"
    },
    valid = _.matches("[0-9]{1,2} ?(kg|cm|ml)"))

  /** `c-1, c-2, c3` mixed-convention ids (§1's execution-guided example). */
  val mixedIds: Archetype = Archetype("mixedIds", semantic = false, irregular = true,
    gen = (rng, n) => Vector.tabulate(n)(i => if (rng.nextDouble() < 0.5) s"c-${i + 1}" else s"c${i + 1}"),
    valid = _.matches("c-?[0-9]+"))

  /** The Fig-2 correlated pair: a category column and a player-id column
    * whose suffix is a function of the category — the workload where
    * learned concretization constraints (decision trees over the category)
    * matter. The *correlated* generation lives in
    * [[BenchGen.correlatedPair]]; these entries provide names/validators.
    */
  val pairCategory: Archetype = Archetype("pairCategory", semantic = false, irregular = false,
    gen = (rng, n) => Vector.fill(n)(if (rng.nextBoolean()) "Junior" else "Professional"),
    valid = Set("Junior", "Professional").contains)

  val pairPlayerId: Archetype = Archetype("pairPlayerId", semantic = true, irregular = false,
    gen = (rng, n) => {
      val cs = ents("country")
      Vector.fill(n)(s"${pick(rng, cs).form("code3").get}-${100 + rng.nextInt(900)}-" +
        (if (rng.nextBoolean()) "PRO" else "CAT"))
    },
    valid = _.matches("[A-Z]{3}-[0-9]{3}-(PRO|CAT)"))

  /** All archetypes by name. */
  val all: Vector[Archetype] = Vector(
    phone, countryCodeId, playerId, url, timeMMSS, quarter, percentPair, city,
    colorQty, nameId, serialDotted, chromeVer, versionStr, money, isoDate,
    stateCode, categorical, plainNumber, freeText, mixedIds, measureMixed,
    pairCategory, pairPlayerId)

  val byName: Map[String, Archetype] = all.map(a => a.name -> a).toMap

  /** Regular archetypes (a learnable latent language exists), excluding the
    * correlated pair (generated jointly by [[BenchGen.correlatedPair]]).
    */
  val regular: Vector[Archetype] =
    all.filterNot(a => a.irregular || a.name.startsWith("pair"))
}
