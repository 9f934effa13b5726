package repro.ml.linreg

import repro.core.query.{AggQuery, Measure}

/** Feature-extraction spec for learning over the join D (paper §3): the label
  * and feature attributes of D. Categorical attributes are one-hot encoded,
  * which LMFAO realises as group-by attributes; an intercept is implicit.
  */
final case class Features(label: String, continuous: Seq[String], categorical: Seq[String]) {
  require(!continuous.contains(label) && !categorical.contains(label), "label must not repeat as a feature")
  require((continuous ++ categorical).distinct.size == continuous.size + categorical.size, "duplicate feature")
  /** Continuous attributes including the label (which joins Σ like a feature
    * with its parameter fixed to -1).
    */
  def contAll: Seq[String] = continuous :+ label
}

/** Builds the batch of group-by aggregates that materialises the non-centred
  * covariance matrix Σ = Σ_{x∈D} x xᵀ (paper §3):
  *
  *   - continuous × continuous →  SELECT SUM(Xj*Xk) FROM D
  *   - categorical × continuous → SELECT Xj, SUM(Xk) FROM D GROUP BY Xj
  *   - categorical × categorical → SELECT Xj, Xk, SUM(1) FROM D GROUP BY Xj, Xk
  *   - intercept row: COUNT, SUM(Xj), per-category counts
  *
  * For Retailer's 43-attribute model this scheme yields the paper's 814
  * aggregates; the count here follows the same combinatorial formula
  * 1 + m + m(m+1)/2 + c + c·m + c(c-1)/2 with m = |contAll|, c = |categorical|.
  */
object SigmaBatch {

  def countQuery: AggQuery = AggQuery("sigma_cnt", Nil, Seq(Measure.count("agg_cnt")))

  def queries(f: Features): Seq[AggQuery] = {
    val m = f.contAll
    val cnt = Seq(countQuery)
    val sums = m.map(a => AggQuery(s"sigma_s_$a", Nil, Seq(Measure.sum(s"agg_s_$a", a))))
    val pairs = for {
      (a, i) <- m.zipWithIndex
      b <- m.drop(i)
    } yield
      if (a == b) AggQuery(s"sigma_p_${a}_$b", Nil, Seq(Measure.sumSquare(s"agg_p_${a}_$b", a)))
      else AggQuery(s"sigma_p_${a}_$b", Nil, Seq(Measure.sumProduct(s"agg_p_${a}_$b", a, b)))
    val catCounts = f.categorical.map(c =>
      AggQuery(s"sigma_c_$c", Seq(c), Seq(Measure.count(s"agg_c_$c"))))
    val catCont = for { c <- f.categorical; a <- m } yield
      AggQuery(s"sigma_cs_${c}_$a", Seq(c), Seq(Measure.sum(s"agg_cs_${c}_$a", a)))
    val catCat = for {
      (c1, i) <- f.categorical.zipWithIndex
      c2 <- f.categorical.drop(i + 1)
    } yield AggQuery(s"sigma_cc_${c1}_$c2", Seq(c1, c2), Seq(Measure.count(s"agg_cc_${c1}_$c2")))
    cnt ++ sums ++ pairs ++ catCounts ++ catCont ++ catCat
  }

  /** Closed-form batch size (checked against `queries(f).size` in tests). */
  def expectedCount(f: Features): Int = {
    val m = f.contAll.size
    val c = f.categorical.size
    1 + m + m * (m + 1) / 2 + c + c * m + c * (c - 1) / 2
  }
}
