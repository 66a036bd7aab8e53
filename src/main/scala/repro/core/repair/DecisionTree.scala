package repro.core.repair

import repro.core.repair.Predicates.Feature

/** Small decision trees over boolean features predicting string labels — the
  * concretization constraints of §3.4.
  *
  * Following the paper: trees of varying node count and depth are considered,
  * filtered to training accuracy ≥ α (default 0.8), ranked ascending by
  * (nodes, depth), and the first qualifying tree is kept. We realize this by
  * trying a single leaf first (1 node), then all depth-1 stumps (3 nodes),
  * then greedy depth-2 and depth-3 trees.
  */
object DecisionTree {

  sealed trait DTree {
    def predict(row: Int, feats: Vector[Feature]): String
    def nodes: Int
    def depth: Int
  }
  final case class Leaf(label: String) extends DTree {
    def predict(row: Int, feats: Vector[Feature]): String = label
    def nodes: Int = 1
    def depth: Int = 0
  }
  final case class Node(feat: Int, t: DTree, f: DTree) extends DTree {
    def predict(row: Int, feats: Vector[Feature]): String =
      if (feats(feat).values(row)) t.predict(row, feats) else f.predict(row, feats)
    def nodes: Int = 1 + t.nodes + f.nodes
    def depth: Int = 1 + math.max(t.depth, f.depth)
  }

  val DefaultAlpha = 0.8

  /** Learn a tree over `examples` (rowIdx → label) with accuracy ≥ `alpha`;
    * `None` when no tree up to depth 3 qualifies.
    */
  def learn(feats: Vector[Feature], examples: Vector[(Int, String)],
            alpha: Double = DefaultAlpha): Option[DTree] = {
    if (examples.isEmpty) return None

    def accuracy(t: DTree): Double =
      examples.count { case (r, l) => t.predict(r, feats) == l }.toDouble / examples.size

    // 1 node: majority leaf
    val leaf = Leaf(majority(examples.map(_._2)))
    if (accuracy(leaf) >= alpha) return Some(leaf)

    // 3 nodes: best depth-1 stump
    val stumps = feats.indices.iterator.map(stump(feats, examples, _))
    val best1  = stumps.map(t => (t, accuracy(t))).filter(_._2 >= alpha)
      .foldLeft(Option.empty[(DTree, Double)]) {
        case (None, c) => Some(c)
        case (Some(b), c) => if (c._2 > b._2) Some(c) else Some(b)
      }
    best1 match {
      case Some((t, _)) => return Some(t)
      case None => ()
    }

    // greedy deeper trees, smallest depth first
    for (d <- 2 to 3) {
      val t = greedy(feats, examples, d)
      if (accuracy(t) >= alpha) return Some(t)
    }
    None
  }

  private def majority(labels: Vector[String]): String =
    labels.groupBy(identity).view.mapValues(_.size).toVector
      .sortBy { case (l, c) => (-c, l) }.head._1

  private def stump(feats: Vector[Feature], examples: Vector[(Int, String)], fi: Int): DTree = {
    val (tr, fl) = examples.partition { case (r, _) => feats(fi).values(r) }
    Node(fi,
      Leaf(if (tr.nonEmpty) majority(tr.map(_._2)) else majority(examples.map(_._2))),
      Leaf(if (fl.nonEmpty) majority(fl.map(_._2)) else majority(examples.map(_._2))))
  }

  private def greedy(feats: Vector[Feature], examples: Vector[(Int, String)], depth: Int): DTree = {
    if (depth == 0 || examples.map(_._2).distinct.size == 1 || examples.isEmpty)
      return Leaf(if (examples.isEmpty) "" else majority(examples.map(_._2)))
    // pick the split minimizing weighted misclassification of majority children
    val scored = feats.indices.map { fi =>
      val (tr, fl) = examples.partition { case (r, _) => feats(fi).values(r) }
      val err = miss(tr) + miss(fl)
      (fi, err, tr, fl)
    }
    val (fi, err, tr, fl) = scored.minBy { case (i, e, _, _) => (e, i) }
    // allow zero-gain splits (err == current miss): deeper levels may still
    // separate xor-like label structure
    if (err > miss(examples) || tr.isEmpty || fl.isEmpty)
      Leaf(majority(examples.map(_._2)))
    else
      Node(fi, greedy(feats, tr, depth - 1), greedy(feats, fl, depth - 1))
  }

  private def miss(ex: Vector[(Int, String)]): Int =
    if (ex.isEmpty) 0 else ex.size - ex.groupBy(_._2).values.map(_.size).max
}
