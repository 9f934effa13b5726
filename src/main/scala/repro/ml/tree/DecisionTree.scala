package repro.ml.tree

import org.apache.spark.sql.DataFrame

import repro.core.exec.LmfaoExec
import repro.core.query.Predicate
import repro.core.schema.JoinTree
import repro.core.viewgen.ViewGeneration
import repro.ml.tree.SplitFinder.negate

/** A learned regression tree node: either a leaf prediction or a split with
  * the left child satisfying `split.predicate`.
  */
sealed trait TreeNode {
  def predict(row: Map[String, Long]): Double = this match {
    case Leaf(v) => v
    case Inner(split, left, right) =>
      val x = row(split.predicate.attr)
      val goesLeft = split.predicate.op match {
        case repro.core.query.CmpOp.Le => x <= split.predicate.value
        case repro.core.query.CmpOp.Eq => x == split.predicate.value
        case repro.core.query.CmpOp.Ge => x >= split.predicate.value
        case repro.core.query.CmpOp.Ne => x != split.predicate.value
        case repro.core.query.CmpOp.Lt => x < split.predicate.value
        case repro.core.query.CmpOp.Gt => x > split.predicate.value
      }
      if (goesLeft) left.predict(row) else right.predict(row)
  }

  def depth: Int = this match {
    case Leaf(_) => 0
    case Inner(_, l, r) => 1 + math.max(l.depth, r.depth)
  }

  def leaves: Int = this match {
    case Leaf(_) => 1
    case Inner(_, l, r) => l.leaves + r.leaves
  }
}
final case class Leaf(prediction: Double) extends TreeNode
final case class Inner(split: Split, left: TreeNode, right: TreeNode) extends TreeNode

/** CART over the non-materialised join D: every tree node runs one LMFAO
  * batch (one grouped query per feature under the node's path condition) and
  * picks the variance-minimising split (paper §3).
  */
object DecisionTree {

  final case class NodeTrace(pathConds: Seq[Predicate], count: Double, variance: Double,
                             chosen: Option[Split])

  final case class Trained(root: TreeNode, nodes: Seq[NodeTrace])

  def train(tree: JoinTree, tables: Map[String, DataFrame], features: Seq[TreeFeature],
            label: String, maxDepth: Int, minLeaf: Double = 1.0): Trained = {
    val traces = scala.collection.mutable.ArrayBuffer.empty[NodeTrace]

    def grow(pathConds: Seq[Predicate], depth: Int): TreeNode = {
      val stats = nodeStats(tree, tables, features, label, pathConds)
      val first = stats(features.head.attr)
      val n = first.map(_.count).sum
      val sy = first.map(_.sumY).sum
      val sy2 = first.map(_.sumY2).sum
      if (n <= 0) { traces += NodeTrace(pathConds, 0, 0, None); return Leaf(0.0) }
      val mean = sy / n
      val nodeVar = SplitFinder.variance(n, sy, sy2)
      val split =
        if (depth >= maxDepth || n < 2 * minLeaf || nodeVar <= 0) None
        else SplitFinder.bestSplit(stats, features, minLeaf).filter(_.score < nodeVar)
      traces += NodeTrace(pathConds, n, nodeVar, split)
      split match {
        case None => Leaf(mean)
        case Some(s) =>
          val left = grow(pathConds :+ s.predicate, depth + 1)
          val right = grow(pathConds :+ negate(s.predicate), depth + 1)
          Inner(s, left, right)
      }
    }

    Trained(grow(Nil, 0), traces.toSeq)
  }

  /** Run the node batch through the LMFAO engine and collect per-feature
    * value statistics.
    */
  def nodeStats(tree: JoinTree, tables: Map[String, DataFrame], features: Seq[TreeFeature],
                label: String, pathConds: Seq[Predicate]): Map[String, Seq[ValueStats]] = {
    val batch = NodeBatch.queries(features, label, pathConds)
    val plan = ViewGeneration.plan(tree, batch)
    val result = LmfaoExec.run(tables, plan)
    val stats = features.map { f =>
      val rows = result.queryResults(s"node_${f.attr}").collect()
      f.attr -> rows.map { r =>
        ValueStats(
          r.getAs[Any](f.attr).toString.toLong,
          r.getAs[Double](s"cnt_${f.attr}"),
          r.getAs[Double](s"sy_${f.attr}"),
          r.getAs[Double](s"sy2_${f.attr}"),
        )
      }.toSeq
    }.toMap
    result.cleanup()
    stats
  }
}
