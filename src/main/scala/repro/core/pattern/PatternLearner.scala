package repro.core.pattern

import Tokenizer._

/** FlashProfile-lite (§3.1): learns up to `k` regex patterns that jointly
  * cover all values of a column, then selects the *significant* subset —
  * patterns individually covering at least a fraction δ of the values.
  *
  * Algorithm:
  *   1. cluster values by run signature (digit/alpha-shape/space/mask/punct);
  *   2. per cluster, refine each run position to the most specific token that
  *      covers the cluster: literal, small disjunction, or fixed-length /
  *      one-or-more character class;
  *   3. detect repetitions (`unit` repeated r ≥ 2 times becomes `(unit)+`)
  *      and merge clusters that share a unit;
  *   4. while more than `k` patterns remain, unify the two least-covering
  *      compatible patterns by token-wise generalization (class lub, literal
  *      widening), stopping when nothing is compatible.
  */
object PatternLearner {

  /** Result of learning: each pattern with its coverage over the input. */
  final case class LearnedPatterns(patterns: Vector[(Pattern, Double)]) {
    /** Patterns individually covering ≥ `delta` of the column. */
    def significant(delta: Double): Vector[(Pattern, Double)] =
      patterns.filter(_._2 >= delta)

    /** True iff `v` matches any of the given patterns. */
    def matchesAny(v: String, pats: Vector[(Pattern, Double)]): Boolean =
      pats.exists(_._1.matches(v))
  }

  /** Learn patterns over `values` (multiplicities count toward coverage). */
  def learn(values: Seq[String], k: Int = 8): LearnedPatterns = {
    val vs = values.toVector
    if (vs.isEmpty) return LearnedPatterns(Vector.empty)

    val clusters: Vector[Vector[String]] =
      vs.distinct.groupBy(signature).values.toVector

    var patterns = clusters.map(clusterPattern)
    patterns = mergeRepetitions(patterns)
    patterns = capPatterns(patterns, vs, k)

    val withCov = patterns.distinct
      .map(p => p -> p.coverage(vs))
      .sortBy { case (p, c) => (-c, p.pretty) }
    LearnedPatterns(withCov)
  }

  // ---------------------------------------------------------------- step 2

  /** Most specific pattern covering every value of one signature cluster. */
  private[pattern] def clusterPattern(cluster: Vector[String]): Pattern = {
    val runss = cluster.map(runs)
    val arity = runss.head.length
    val toks = (0 until arity).toVector.map { i =>
      val col = runss.map(_(i))
      refine(col, cluster.size)
    }
    Pattern(toks)
  }

  /** Refine one run position across a cluster into a token. */
  private def refine(col: Vector[Run], clusterSize: Int): Tok = {
    val texts    = col.map(_.text)
    val distinct = texts.distinct
    col.head match {
      case MaskRun(t) => MaskTok(t)
      case PunctRun(t) => Lit(t)
      case DigitRun(_) =>
        Cls(CharClassT.Digit, fixedLen(texts))
      case SpaceRun(_) =>
        if (distinct.size == 1) Lit(distinct.head)
        else Cls(CharClassT.Space, fixedLen(texts))
      case AlphaRun(_, _) =>
        if (distinct.size == 1) Lit(distinct.head)
        else if (distinct.size <= 4 && distinct.size < col.size &&
                 distinct.forall(t => texts.count(_ == t) >= 2))
          Disj(distinct.sorted)
        else {
          val shapes = col.collect { case AlphaRun(_, s) => s }.distinct
          val cls =
            if (shapes == Vector(AllLower)) CharClassT.Lower
            else if (shapes == Vector(AllUpper)) CharClassT.Upper
            else CharClassT.Alpha
          Cls(cls, fixedLen(texts))
        }
    }
  }

  private def fixedLen(texts: Vector[String]): Option[Int] = {
    val lens = texts.map(_.length).distinct
    if (lens.size == 1) Some(lens.head) else None
  }

  // ---------------------------------------------------------------- step 3

  /** Strict repetition compatibility: identical tokens, or same-class
    * character classes whose lengths may differ across repetitions. (The
    * generalizing [[unifyTok]] is deliberately NOT used here — it would
    * collapse e.g. `A[0-9]` into `([a-zA-Z0-9])+`.)
    */
  private def compatTok(a: Tok, b: Tok): Boolean = (a, b) match {
    case (x, y) if x == y         => true
    case (Cls(c1, _), Cls(c2, _)) => c1 == c2
    case _                        => false
  }

  /** Smallest repeating unit of a token vector: returns (unit, reps). */
  private[pattern] def smallestUnit(toks: Vector[Tok]): (Vector[Tok], Int) = {
    val n = toks.length
    (1 to n / 2).find { p =>
      n % p == 0 && {
        val unit = toks.take(p)
        (1 until n / p).forall { r =>
          toks.slice(r * p, (r + 1) * p).zip(unit).forall { case (a, b) => compatTok(a, b) }
        }
      }
    } match {
      case Some(p) =>
        // unify across repetitions so e.g. [0-9]{1} and [0-9]{2} widen to +
        val unit = (0 until toks.length / p).map(r => toks.slice(r * p, (r + 1) * p))
          .reduce((a, b) => a.zip(b).map { case (x, y) => unifyTok(x, y).get })
        (unit, toks.length / p)
      case None => (toks, 1)
    }
  }

  /** Merge patterns sharing a repetition unit into a single `(unit)+`. */
  private[pattern] def mergeRepetitions(patterns: Vector[Pattern]): Vector[Pattern] = {
    val analyzed = patterns.map { p =>
      if (p.toks.exists(_.isInstanceOf[Group])) (p.toks, 1, p) // already grouped
      else { val (u, r) = smallestUnit(p.toks); (u, r, p) }
    }
    // group by unit arity+signature; units unify pairwise
    val out = Vector.newBuilder[Pattern]
    val used = Array.fill(analyzed.length)(false)
    for (i <- analyzed.indices if !used(i)) {
      val (ui, ri, pi) = analyzed(i)
      val mates = (i + 1 until analyzed.length).filter { j =>
        !used(j) && {
          val (uj, _, _) = analyzed(j)
          ui.length == uj.length && ui.zip(uj).forall { case (a, b) => compatTok(a, b) }
        }
      }
      val group = i +: mates
      val repsDiffer = group.map(analyzed(_)._2).distinct.size > 1
      val anyRepeats = group.exists(analyzed(_)._2 >= 2)
      if (group.size > 1 && anyRepeats || (group.size == 1 && ri >= 2)) {
        if (group.size == 1 && !repsDiffer && ri >= 2) {
          // single cluster with internal repetition: (unit)+
          out += Pattern(Vector(Group(ui)))
          used(i) = true
        } else if (anyRepeats) {
          val unit = group.map(analyzed(_)._1).reduce((a, b) =>
            a.zip(b).map { case (x, y) => unifyTok(x, y).get })
          out += Pattern(Vector(Group(unit)))
          group.foreach(used(_) = true)
        }
      }
      if (!used(i)) { out += pi; used(i) = true }
    }
    out.result().distinct
  }

  // ---------------------------------------------------------------- step 4

  /** Token-wise generalization; `None` when the tokens are incompatible. */
  private[pattern] def unifyTok(a: Tok, b: Tok): Option[Tok] = (a, b) match {
    case (x, y) if x == y => Some(x)
    case (MaskTok(x), MaskTok(y)) => if (x == y) Some(a) else None
    case (Lit(x), Lit(y)) =>
      classOfText(x).flatMap(cx => classOfText(y).map { cy =>
        Cls(CharClassT.lub(cx, cy), if (x.length == y.length) Some(x.length) else None)
      })
    case (Cls(c1, l1), Cls(c2, l2)) =>
      Some(Cls(CharClassT.lub(c1, c2), if (l1 == l2) l1 else None))
    case (Cls(c, l), Lit(s)) =>
      classOfText(s).map(cs => Cls(CharClassT.lub(c, cs),
        if (l.contains(s.length)) l else None))
    case (l: Lit, c: Cls) => unifyTok(c, l)
    case (Disj(xs), Lit(s))  => unifyTok(Cls(disjClass(xs), disjLen(xs)), Lit(s))
    case (Lit(s), Disj(xs))  => unifyTok(Disj(xs), Lit(s))
    case (Disj(xs), Cls(c, l)) => unifyTok(Cls(disjClass(xs), disjLen(xs)), Cls(c, l))
    case (Cls(c, l), Disj(xs)) => unifyTok(Disj(xs), Cls(c, l))
    case (Disj(xs), Disj(ys)) =>
      unifyTok(Cls(disjClass(xs), disjLen(xs)), Cls(disjClass(ys), disjLen(ys)))
    case _ => None
  }

  private def disjClass(alts: Vector[String]): CharClassT =
    alts.flatMap(classOfText).reduceOption(CharClassT.lub).getOrElse(CharClassT.AlphaNumSpace)

  private def disjLen(alts: Vector[String]): Option[Int] = {
    val lens = alts.map(_.length).distinct
    if (lens.size == 1) Some(lens.head) else None
  }

  /** Most specific class covering every char of `s`, if all chars are classed. */
  private def classOfText(s: String): Option[CharClassT] = {
    val cs = s.map(CharClassT.of)
    if (cs.exists(_.isEmpty)) None
    else Some(cs.flatten.reduce(CharClassT.lub))
  }

  /** Reduce to ≤ k patterns by unifying least-covering compatible pairs. */
  private def capPatterns(patterns: Vector[Pattern], vs: Vector[String], k: Int): Vector[Pattern] = {
    var ps = patterns.distinct
    var progress = true
    while (ps.length > k && progress) {
      progress = false
      val byCov = ps.sortBy(p => p.coverage(vs))
      val pair = (for {
        i <- byCov.indices.iterator
        j <- (i + 1 until byCov.length).iterator
        u <- unifyPattern(byCov(i), byCov(j)).iterator
      } yield (byCov(i), byCov(j), u)).take(1).toSeq.headOption
      pair match {
        case Some((a, b, u)) =>
          ps = (ps.filterNot(p => p == a || p == b) :+ u).distinct
          progress = true
        case None => progress = false
      }
    }
    ps
  }

  private def unifyPattern(a: Pattern, b: Pattern): Option[Pattern] =
    if (a.toks.length != b.toks.length) None
    else {
      val us = a.toks.zip(b.toks).map { case (x, y) => unifyTok(x, y) }
      if (us.forall(_.isDefined)) Some(Pattern(us.flatten)) else None
    }
}
