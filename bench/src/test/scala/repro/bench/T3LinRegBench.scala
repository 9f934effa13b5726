package repro.bench

import repro.SparkSpec
import repro.exp.{T3LinReg, Workloads}

/** Bench for Table T3: end-to-end ridge linear regression by BGD. */
class T3LinRegBench extends SparkSpec {

  test("T3: sigma-once BGD vs scan-per-iteration baseline") {
    val sf = Workloads.benchSf
    val table = T3LinReg.run(spark, sf)
    println(table.render)
    assert(table.rows.size == 3)
    // Shape: LMFAO's BGD-iteration cost stays tiny relative to the Σ batch
    // (column 2 is the in-memory BGD time) across all iteration budgets.
    table.rows.foreach { r =>
      val bgd = r(2).toDouble
      val sigma = r(1).toDouble
      assert(bgd < math.max(1.0, sigma), s"in-memory BGD unexpectedly slow: $bgd s")
    }
  }
}
