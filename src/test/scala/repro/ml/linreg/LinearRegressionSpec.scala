package repro.ml.linreg

import repro.SparkSpec
import repro.core.exec.LmfaoExec
import repro.core.schema.{JoinTree, Relation}
import repro.core.viewgen.ViewGeneration
import repro.ml.linalg.Vec

class LinearRegressionSpec extends SparkSpec {

  /** A single-relation dataset where y = 3 + 2·x1 − x2 exactly. */
  private lazy val planted: (JoinTree, Map[String, org.apache.spark.sql.DataFrame], Features) = {
    import spark.implicits._
    val rng = new scala.util.Random(11)
    val rows = Seq.fill(200) {
      val x1 = rng.nextInt(10) + 1L
      val x2 = rng.nextInt(10) + 1L
      (x1, x2, 3 + 2 * x1 - x2)
    }
    val tree = JoinTree(Seq(Relation("R", Seq("x1", "x2", "y"))), Nil)
    (tree, Map("R" -> rows.toDF("x1", "x2", "y")), Features("y", Seq("x1", "x2"), Nil))
  }

  private def sigmaOf(tree: JoinTree, tables: Map[String, org.apache.spark.sql.DataFrame],
                      f: Features): Sigma = {
    val plan = ViewGeneration.plan(tree, SigmaBatch.queries(f))
    val res = LmfaoExec.run(tables, plan)
    val s = Sigma.assemble(res.queryResults, f)
    res.cleanup()
    s
  }

  test("exact solve recovers the planted coefficients at lambda=0") {
    val (tree, tables, f) = planted
    val sigma = sigmaOf(tree, tables, f)
    val theta = LinearRegression.solveExact(sigma, lambda = 0.0)
    assert(math.abs(theta(0) - 3.0) < 1e-8, s"intercept ${theta(0)}")
    assert(math.abs(theta(1) - 2.0) < 1e-8, s"x1 ${theta(1)}")
    assert(math.abs(theta(2) + 1.0) < 1e-8, s"x2 ${theta(2)}")
  }

  test("the gradient vanishes at the exact solution") {
    val (tree, tables, f) = planted
    val sigma = sigmaOf(tree, tables, f)
    val theta = LinearRegression.solveExact(sigma, lambda = 0.01)
    val g = LinearRegression.gradient(sigma, theta, lambda = 0.01)
    assert(Vec.norm2(g) < 1e-8, s"|grad| = ${Vec.norm2(g)}")
  }

  test("BGD monotonically decreases the objective") {
    val (tree, tables, f) = planted
    val sigma = sigmaOf(tree, tables, f)
    val fit = LinearRegression.trainBgd(sigma, lambda = 0.01, maxIters = 50)
    fit.objective.sliding(2).foreach {
      case Seq(a, b) => assert(b <= a + 1e-12, s"objective increased: $a -> $b")
      case _ =>
    }
  }

  test("BGD converges to the closed-form objective") {
    val (tree, tables, f) = planted
    val sigma = sigmaOf(tree, tables, f)
    val lambda = 0.01
    val exact = LinearRegression.solveExact(sigma, lambda)
    val jStar = LinearRegression.objective(sigma, exact, lambda)
    val fit = LinearRegression.trainBgd(sigma, lambda, maxIters = 3000)
    assert(fit.objective.last <= jStar + math.abs(jStar) * 1e-3 + 1e-6,
      s"BGD ${fit.objective.last} vs exact $jStar")
  }

  test("theta_label stays fixed at -1") {
    val (tree, tables, f) = planted
    val sigma = sigmaOf(tree, tables, f)
    val fit = LinearRegression.trainBgd(sigma, lambda = 0.01, maxIters = 20)
    assert(fit.theta(sigma.labelIdx) == -1.0)
    assert(LinearRegression.solveExact(sigma, 0.01).apply(sigma.labelIdx) == -1.0)
  }

  test("ridge shrinks coefficients toward zero") {
    val (tree, tables, f) = planted
    val sigma = sigmaOf(tree, tables, f)
    val loose = LinearRegression.solveExact(sigma, lambda = 0.0)
    val tight = LinearRegression.solveExact(sigma, lambda = 100.0)
    val looseNorm = Vec.norm2(Array(loose(1), loose(2)))
    val tightNorm = Vec.norm2(Array(tight(1), tight(2)))
    assert(tightNorm < looseNorm)
  }

  test("categorical model: exact solve fits group means") {
    // y depends only on the categorical g: y = 10*g. With one-hot encoding
    // (and no intercept collinearity issues thanks to ridge), predictions on
    // the training points must be close to the group means.
    import spark.implicits._
    val rng = new scala.util.Random(5)
    val rows = Seq.fill(120) { val g = rng.nextInt(4) + 1L; (g, 10 * g) }
    val tree = JoinTree(Seq(Relation("R", Seq("g", "y"))), Nil)
    val tables = Map("R" -> rows.toDF("g", "y"))
    val f = Features("y", Nil, Seq("g"))
    val sigma = sigmaOf(tree, tables, f)
    val theta = LinearRegression.solveExact(sigma, lambda = 1e-6)
    (1L to 4L).foreach { g =>
      val pred = theta(0) + theta(sigma.catValueIndex("g")(g))
      assert(math.abs(pred - 10 * g) < 1e-2, s"g=$g pred=$pred")
    }
  }

  test("objective at the zero-weight start equals the label second moment term") {
    val (tree, tables, f) = planted
    val sigma = sigmaOf(tree, tables, f)
    val theta0 = new Array[Double](sigma.dim)
    theta0(sigma.labelIdx) = -1.0
    val j0 = LinearRegression.objective(sigma, theta0, lambda = 0.0)
    val sy2 = sigma.matrix(sigma.labelIdx, sigma.labelIdx)
    assert(math.abs(j0 - sy2 / (2.0 * sigma.count)) < 1e-9)
  }
}
