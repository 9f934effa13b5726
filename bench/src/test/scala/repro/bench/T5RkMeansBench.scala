package repro.bench

import repro.SparkSpec
import repro.exp.{T5RkMeans, Workloads}

/** Bench for Table T5: Rk-means coreset size and clustering quality. */
class T5RkMeansBench extends SparkSpec {

  test("T5: Rk-means quality and coreset size vs full Lloyd's") {
    val sf = Workloads.benchSf
    val table = T5RkMeans.run(spark, sf)
    println(table.render)
    val byMetric = table.rows.map(r => r(0) -> r(1)).toMap
    // Coreset must be a vanishing fraction of |D|.
    assert(byMetric("relative coreset size |G|/|D|").toDouble < 0.01)
    // Constant-factor approximation: within 3x of Lloyd's on this data.
    assert(byMetric("relative approximation").toDouble < 2.0)
  }
}
