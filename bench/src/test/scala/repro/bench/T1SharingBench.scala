package repro.bench

import repro.SparkSpec
import repro.exp.{T1Sharing, Workloads}

/** Bench for Table T1: batch sizes and computation sharing. */
class T1SharingBench extends SparkSpec {

  test("T1: batch sizes and sharing statistics") {
    val sf = Workloads.benchSf
    val table = T1Sharing.run(spark, sf)
    println(table.render)

    // Shape assertions: merging must collapse the per-query views and the
    // grouped plan must be smaller than the query count for large batches.
    T1Sharing.workloads(sf).foreach { w =>
      val s = T1Sharing.stats(w)
      assert(s.nMergedViews <= s.nUnmergedViews, w.name)
      if (s.nQueries >= 10) {
        assert(s.nMergedViews * 2 <= s.nUnmergedViews, s"${w.name}: no effective merging")
        assert(s.nGroups <= s.nQueries, s"${w.name}: more groups than queries")
      }
    }
  }
}
