package repro.bench

import repro.SparkSpec
import repro.exp.{T4DecisionTree, Workloads}

/** Bench for Table T4: CART node batches, LMFAO vs per-feature jobs. */
class T4DecisionTreeBench extends SparkSpec {

  test("T4: root-node split batch and depth-2 tree") {
    val sf = Workloads.benchSf
    val table = T4DecisionTree.run(spark, sf)
    println(table.render)
    assert(table.rows.size == 4)
    assert(table.rows.forall(_.apply(4).toDouble > 0))
    // Shape: the paper's per-aggregate strategy must be far slower than the
    // grouped LMFAO batch.
    val lmfao = table.rows.head(4).toDouble
    val perCond = table.rows(2)(4).toDouble
    assert(perCond > lmfao * 5, s"per-condition $perCond s vs LMFAO $lmfao s")
  }
}
