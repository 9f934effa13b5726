package repro.ml.tree

import repro.core.query.{CmpOp, Predicate}

/** Per-feature-value statistics from a node-batch query result. */
final case class ValueStats(value: Long, count: Double, sumY: Double, sumY2: Double)

/** A candidate split with its resulting label variance (lower is better). */
final case class Split(
    feature: TreeFeature,
    predicate: Predicate,          // condition satisfied by the LEFT child
    score: Double,                 // varL + varR (the CART objective)
    leftCount: Double,
    rightCount: Double,
)

/** CART split selection from grouped (value, SUM(1), SUM(Y), SUM(Y²)) stats:
  * one prefix-sum sweep per continuous feature, one one-vs-rest pass per
  * categorical feature (paper §3: VARIANCE = ΣY² − (ΣY)²/|T|, minimised over
  * conditions Xj op t).
  */
object SplitFinder {

  def variance(count: Double, sumY: Double, sumY2: Double): Double =
    if (count <= 0) 0.0 else sumY2 - sumY * sumY / count

  /** Best split across all features; None if no split separates the data or
    * a child would drop below `minLeaf` tuples.
    */
  def bestSplit(stats: Map[String, Seq[ValueStats]], features: Seq[TreeFeature],
                minLeaf: Double = 1.0): Option[Split] = {
    val candidates = features.flatMap { f =>
      val vs = stats.getOrElse(f.attr, Nil).sortBy(_.value)
      if (vs.size < 2) Nil
      else {
        val totalC = vs.map(_.count).sum
        val totalY = vs.map(_.sumY).sum
        val totalY2 = vs.map(_.sumY2).sum
        f.kind match {
          case FeatureKind.Continuous =>
            // Sweep thresholds between consecutive distinct values.
            var accC = 0.0; var accY = 0.0; var accY2 = 0.0
            vs.init.map { v =>
              accC += v.count; accY += v.sumY; accY2 += v.sumY2
              val score = variance(accC, accY, accY2) +
                variance(totalC - accC, totalY - accY, totalY2 - accY2)
              Split(f, Predicate(f.attr, CmpOp.Le, v.value), score, accC, totalC - accC)
            }
          case FeatureKind.Categorical =>
            vs.map { v =>
              val score = variance(v.count, v.sumY, v.sumY2) +
                variance(totalC - v.count, totalY - v.sumY, totalY2 - v.sumY2)
              Split(f, Predicate(f.attr, CmpOp.Eq, v.value), score, v.count, totalC - v.count)
            }
        }
      }
    }
    candidates
      .filter(s => s.leftCount >= minLeaf && s.rightCount >= minLeaf)
      // Deterministic tie-break: lowest score, then feature/threshold order.
      .sortBy(s => (s.score, s.feature.attr, s.predicate.value))
      .headOption
  }

  /** Complement of a left-child predicate, for the right child. */
  def negate(p: Predicate): Predicate = p.op match {
    case CmpOp.Le => p.copy(op = CmpOp.Gt)
    case CmpOp.Eq => p.copy(op = CmpOp.Ne)
    case CmpOp.Ge => p.copy(op = CmpOp.Lt)
    case CmpOp.Ne => p.copy(op = CmpOp.Eq)
    case CmpOp.Lt => p.copy(op = CmpOp.Ge)
    case CmpOp.Gt => p.copy(op = CmpOp.Le)
  }
}
