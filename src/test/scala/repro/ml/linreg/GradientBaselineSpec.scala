package repro.ml.linreg

import repro.SparkSpec
import repro.core.baseline.Baselines
import repro.core.exec.LmfaoExec
import repro.core.viewgen.ViewGeneration
import repro.{TestData}

class GradientBaselineSpec extends SparkSpec {

  private lazy val (tree, tables) = TestData.chain(spark, n = 120)
  private val f = Features("d", Seq("a", "b"), Nil)
  private lazy val d = Baselines.joinAll(tree, tables).cache()

  test("baseline objective decreases over iterations") {
    val fit = GradientBaseline.train(d, f.continuous, f.label, lambda = 0.0, iterations = 30, step0 = None)
    assert(fit.objective.last < fit.objective.head)
  }

  test("baseline approaches the closed-form optimum of the LMFAO path") {
    val plan = ViewGeneration.plan(tree, SigmaBatch.queries(f))
    val res = LmfaoExec.run(tables, plan)
    val sigma = Sigma.assemble(res.queryResults, f)
    res.cleanup()
    val exact = LinearRegression.solveExact(sigma, lambda = 0.0)
    val jStar = LinearRegression.objective(sigma, exact, lambda = 0.0)
    val fit = GradientBaseline.train(d, f.continuous, f.label, lambda = 0.0, iterations = 400, step0 = None)
    // First-order method on an ill-conditioned quadratic: same ballpark.
    assert(fit.objective.last < jStar * 1.25 + 1e-9,
      s"baseline ${fit.objective.last} vs exact $jStar")
  }

  test("iteration count is honoured") {
    val fit = GradientBaseline.train(d, f.continuous, f.label, lambda = 0.0, iterations = 7, step0 = None)
    assert(fit.iterations == 7 && fit.objective.size == 7)
  }

  test("objectives agree between the two implementations at theta = 0") {
    val plan = ViewGeneration.plan(tree, SigmaBatch.queries(f))
    val res = LmfaoExec.run(tables, plan)
    val sigma = Sigma.assemble(res.queryResults, f)
    res.cleanup()
    val theta0 = new Array[Double](sigma.dim)
    theta0(sigma.labelIdx) = -1.0
    val jSigma = LinearRegression.objective(sigma, theta0, lambda = 0.0)
    val fit = GradientBaseline.train(d, f.continuous, f.label, lambda = 0.0, iterations = 1, step0 = Some(0.0))
    assert(math.abs(fit.objective.head - jSigma) < 1e-6 * (1 + math.abs(jSigma)),
      s"baseline J(0)=${fit.objective.head} sigma J(0)=$jSigma")
  }
}
