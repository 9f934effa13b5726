package repro.ml.rkmeans

import repro.{Check, SparkSpec, TestData}
import repro.core.baseline.Baselines

class RkMeansSpec extends SparkSpec {

  private lazy val (tree, tables) = TestData.star(spark, n = 150)
  private val dims = Seq("x", "u")

  test("projection queries are n group-by counts") {
    val qs = RkMeans.projectionQueries(dims)
    assert(qs.size == 2)
    assert(qs.map(_.groupBy) == Seq(Seq("x"), Seq("u")))
  }

  test("the Step-1 projections match DuckDB") {
    Check.lmfaoVsDuck(tree, tables, RkMeans.projectionQueries(dims))
  }

  test("augment preserves the tree shape and adds assignment columns") {
    val assignments = Map(
      "x" -> (1L to 20L).map(v => v -> (v % 3)).toMap,
      "u" -> (1L to 10L).map(v => v -> (v % 2)).toMap)
    val (t2, tabs2) = RkMeans.augment(spark, tree, tables, dims, assignments)
    assert(t2.edges == tree.edges)
    assert(t2.relationByName("S").attrs.contains("c_x"))
    assert(t2.relationByName("D1").attrs.contains("c_u"))
    assert(tabs2("S").columns.contains("c_x"))
  }

  test("coreset weights sum to |D|") {
    val r = RkMeans.run(spark, tree, tables, dims, k = 3, kPerDim = 3)
    val dCount = Baselines.joinAll(tree, tables).count()
    assert(r.datasetSize == dCount.toDouble)
  }

  test("coreset size is bounded by the grid resolution") {
    val r = RkMeans.run(spark, tree, tables, dims, k = 3, kPerDim = 3)
    assert(r.coresetSize <= math.pow(3, dims.size).toLong)
    assert(r.coresetSize >= 1)
  }

  test("per-dimension clustering returns kPerDim centroids at most") {
    val r = RkMeans.run(spark, tree, tables, dims, k = 3, kPerDim = 4)
    dims.foreach(a => assert(r.perDimCentroids(a).length <= 4))
  }

  test("final centroid count is at most k") {
    val r = RkMeans.run(spark, tree, tables, dims, k = 3, kPerDim = 3)
    assert(r.centroids.length <= 3)
    assert(r.centroids.forall(_.length == dims.size))
  }

  test("Rk-means cost is within a small factor of Lloyd's on D") {
    val k = 3
    val r = RkMeans.run(spark, tree, tables, dims, k = k, kPerDim = 5)
    val rkCost = RkMeans.fullCost(spark, tree, tables, dims, r.centroids)
    val lloyd = RkMeans.fullLloyd(spark, tree, tables, dims, k)
    val lloydCost = RkMeans.fullCost(spark, tree, tables, dims, lloyd.centroids)
    // The paper proves a constant-factor approximation; on this easy micro
    // data the factor should be modest.
    assert(rkCost <= lloydCost * 3.0 + 1e-9, s"rk=$rkCost lloyd=$lloydCost")
    assert(rkCost >= lloydCost * 0.5 - 1e-9, "Rk-means cannot beat the optimum by 2x")
  }

  test("grid coreset on a 1-d problem reduces to the per-dim clustering") {
    val r = RkMeans.run(spark, tree, tables, Seq("x"), k = 2, kPerDim = 4)
    assert(r.coresetSize <= 4)
    assert(r.centroids.forall(_.length == 1))
  }

  test("fullLloyd's weighted objective equals cost of its own centroids") {
    val lloyd = RkMeans.fullLloyd(spark, tree, tables, dims, 3)
    val c = RkMeans.fullCost(spark, tree, tables, dims, lloyd.centroids)
    assert(math.abs(c - lloyd.cost) < 1e-6 * (1 + lloyd.cost))
  }

  test("deterministic end-to-end for a fixed seed") {
    val a = RkMeans.run(spark, tree, tables, dims, k = 3, kPerDim = 3, seed = 5)
    val b = RkMeans.run(spark, tree, tables, dims, k = 3, kPerDim = 3, seed = 5)
    assert(a.centroids.map(_.toSeq).toSeq == b.centroids.map(_.toSeq).toSeq)
    assert(a.coresetSize == b.coresetSize)
  }
}
