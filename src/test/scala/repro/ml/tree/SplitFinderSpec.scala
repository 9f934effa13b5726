package repro.ml.tree

import org.scalatest.funsuite.AnyFunSuite

import repro.core.query.{CmpOp, Predicate}

class SplitFinderSpec extends AnyFunSuite {

  private val cont = TreeFeature("x", FeatureKind.Continuous)
  private val cat = TreeFeature("g", FeatureKind.Categorical)

  test("variance formula matches the definition") {
    // values 1,2,3: sum=6, sum2=14, n=3 → 14 - 36/3 = 2
    assert(SplitFinder.variance(3, 6, 14) == 2.0)
    assert(SplitFinder.variance(0, 0, 0) == 0.0)
  }

  test("continuous split separates two pure groups perfectly") {
    // y = 10 for x<=2, y = 20 for x>=3.
    val stats = Map("x" -> Seq(
      ValueStats(1, 5, 50, 500), ValueStats(2, 5, 50, 500),
      ValueStats(3, 5, 100, 2000), ValueStats(4, 5, 100, 2000)))
    val s = SplitFinder.bestSplit(stats, Seq(cont)).get
    assert(s.predicate == Predicate("x", CmpOp.Le, 2))
    assert(s.score == 0.0)
    assert(s.leftCount == 10 && s.rightCount == 10)
  }

  test("continuous sweep considers every threshold between distinct values") {
    val stats = Map("x" -> Seq(
      ValueStats(1, 1, 1, 1), ValueStats(5, 1, 2, 4), ValueStats(9, 1, 30, 900)))
    // Best split must isolate the outlier y=30: threshold x<=5.
    val s = SplitFinder.bestSplit(stats, Seq(cont)).get
    assert(s.predicate == Predicate("x", CmpOp.Le, 5))
  }

  test("categorical split is one-vs-rest on equality") {
    // g=2 has mean 100, g in {1,3} mean 1.
    val stats = Map("g" -> Seq(
      ValueStats(1, 10, 10, 10), ValueStats(2, 10, 1000, 100000), ValueStats(3, 10, 10, 10)))
    val s = SplitFinder.bestSplit(stats, Seq(cat)).get
    assert(s.predicate == Predicate("g", CmpOp.Eq, 2))
  }

  test("best split is chosen across features") {
    val stats = Map(
      "x" -> Seq(ValueStats(1, 5, 50, 520), ValueStats(2, 5, 52, 560)),   // bad split
      "g" -> Seq(ValueStats(1, 5, 0, 0), ValueStats(2, 5, 100, 2000)))    // perfect split
    val s = SplitFinder.bestSplit(stats, Seq(cont, cat)).get
    assert(s.feature.attr == "g" && s.score == 0.0)
  }

  test("brute force agreement on random stats (continuous)") {
    val rng = new scala.util.Random(3)
    (1 to 20).foreach { _ =>
      val vs = (1 to 2 + rng.nextInt(6)).map { v =>
        val n = 1 + rng.nextInt(9)
        val ys = Seq.fill(n)(rng.nextInt(20) + 1)
        ValueStats(v.toLong, n, ys.sum, ys.map(y => y * y).sum)
      }
      val got = SplitFinder.bestSplit(Map("x" -> vs), Seq(cont)).get
      // brute force over all thresholds
      val brute = vs.init.map { t =>
        val (l, r) = vs.partition(_.value <= t.value)
        SplitFinder.variance(l.map(_.count).sum, l.map(_.sumY).sum, l.map(_.sumY2).sum) +
          SplitFinder.variance(r.map(_.count).sum, r.map(_.sumY).sum, r.map(_.sumY2).sum)
      }.min
      assert(math.abs(got.score - brute) < 1e-9)
    }
  }

  test("minLeaf filters out tiny children") {
    val stats = Map("x" -> Seq(ValueStats(1, 1, 100, 10000), ValueStats(2, 99, 99, 99)))
    assert(SplitFinder.bestSplit(stats, Seq(cont), minLeaf = 5).isEmpty)
    assert(SplitFinder.bestSplit(stats, Seq(cont), minLeaf = 1).nonEmpty)
  }

  test("a single distinct value yields no split") {
    val stats = Map("x" -> Seq(ValueStats(1, 10, 50, 300)))
    assert(SplitFinder.bestSplit(stats, Seq(cont)).isEmpty)
  }

  test("missing feature stats yield no split") {
    assert(SplitFinder.bestSplit(Map.empty, Seq(cont)).isEmpty)
  }

  test("ties break deterministically by feature then threshold") {
    // Two identical features: the alphabetically first attr wins.
    val vs = Seq(ValueStats(1, 5, 0, 0), ValueStats(2, 5, 100, 2000))
    val fa = TreeFeature("a", FeatureKind.Continuous)
    val fb = TreeFeature("b", FeatureKind.Continuous)
    val s = SplitFinder.bestSplit(Map("a" -> vs, "b" -> vs), Seq(fb, fa)).get
    assert(s.feature.attr == "a")
  }

  test("negate inverts every operator") {
    assert(SplitFinder.negate(Predicate("x", CmpOp.Le, 1)) == Predicate("x", CmpOp.Gt, 1))
    assert(SplitFinder.negate(Predicate("x", CmpOp.Gt, 1)) == Predicate("x", CmpOp.Le, 1))
    assert(SplitFinder.negate(Predicate("x", CmpOp.Eq, 1)) == Predicate("x", CmpOp.Ne, 1))
    assert(SplitFinder.negate(Predicate("x", CmpOp.Ne, 1)) == Predicate("x", CmpOp.Eq, 1))
    assert(SplitFinder.negate(Predicate("x", CmpOp.Ge, 1)) == Predicate("x", CmpOp.Lt, 1))
    assert(SplitFinder.negate(Predicate("x", CmpOp.Lt, 1)) == Predicate("x", CmpOp.Ge, 1))
  }

  test("conceptual aggregate count matches the paper's 3-per-condition scheme") {
    val feats = Seq(cont, cat)
    val counts = Map("x" -> 11, "g" -> 4)
    // continuous: 10 thresholds, categorical: 4 equalities → 3*(10+4) = 42
    assert(NodeBatch.conceptualAggregates(counts, feats) == 42)
  }
}
