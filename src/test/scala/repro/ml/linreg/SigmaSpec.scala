package repro.ml.linreg

import repro.{SparkSpec, TestData}
import repro.core.baseline.Baselines
import repro.core.exec.LmfaoExec
import repro.core.viewgen.ViewGeneration

/** Σ assembled from the LMFAO batch must equal the brute-force Σ = Σ x xᵀ
  * computed tuple-at-a-time over the materialised join with explicit one-hot
  * encoding.
  */
class SigmaSpec extends SparkSpec {

  private def assembleViaEngine(tree: repro.core.schema.JoinTree,
                                tables: Map[String, org.apache.spark.sql.DataFrame],
                                f: Features): Sigma = {
    val plan = ViewGeneration.plan(tree, SigmaBatch.queries(f))
    val res = LmfaoExec.run(tables, plan)
    val s = Sigma.assemble(res.queryResults, f)
    res.cleanup()
    s
  }

  private def bruteForce(tree: repro.core.schema.JoinTree,
                         tables: Map[String, org.apache.spark.sql.DataFrame],
                         f: Features, sigma: Sigma): repro.ml.linalg.DenseMatrix = {
    val d = Baselines.joinAll(tree, tables).collect()
    val m = repro.ml.linalg.DenseMatrix.zeros(sigma.dim, sigma.dim)
    d.foreach { row =>
      val x = new Array[Double](sigma.dim)
      x(0) = 1.0
      f.continuous.zipWithIndex.foreach { case (a, i) =>
        x(1 + i) = row.getAs[Long](a).toDouble
      }
      f.categorical.foreach { c =>
        x(sigma.catValueIndex(c)(row.getAs[Long](c))) = 1.0
      }
      x(sigma.labelIdx) = row.getAs[Long](f.label).toDouble
      for (i <- 0 until sigma.dim; j <- 0 until sigma.dim) m(i, j) += x(i) * x(j)
    }
    m
  }

  private def assertSame(a: repro.ml.linalg.DenseMatrix, b: repro.ml.linalg.DenseMatrix): Unit = {
    assert(a.rows == b.rows && a.cols == b.cols)
    for (i <- 0 until a.rows; j <- 0 until a.cols)
      assert(a(i, j) == b(i, j), s"Σ($i,$j): engine=${a(i, j)} brute=${b(i, j)}")
  }

  test("Σ over a single relation matches the brute force (cont + cat)") {
    val (tree, tables) = TestData.single(spark)
    val f = Features("y", Seq("x"), Seq("g"))
    val sigma = assembleViaEngine(tree, tables, f)
    assertSame(sigma.matrix, bruteForce(tree, tables, f, sigma))
  }

  test("Σ over the star schema matches the brute force (cross-relation features)") {
    val (tree, tables) = TestData.star(spark)
    val f = Features("x", Seq("u"), Seq("v", "k1"))
    val sigma = assembleViaEngine(tree, tables, f)
    assertSame(sigma.matrix, bruteForce(tree, tables, f, sigma))
  }

  test("Σ over the chain matches the brute force (continuous only)") {
    val (tree, tables) = TestData.chain(spark)
    val f = Features("d", Seq("a", "b"), Nil)
    val sigma = assembleViaEngine(tree, tables, f)
    assertSame(sigma.matrix, bruteForce(tree, tables, f, sigma))
  }

  test("Σ is symmetric and count is |D|") {
    val (tree, tables) = TestData.star(spark)
    val f = Features("x", Seq("u"), Seq("v"))
    val sigma = assembleViaEngine(tree, tables, f)
    assert(sigma.matrix.isSymmetric())
    assert(sigma.count == Baselines.joinAll(tree, tables).count().toDouble)
    assert(sigma.matrix(0, 0) == sigma.count)
  }

  test("index layout: intercept first, label last, categoricals contiguous") {
    val (tree, tables) = TestData.single(spark)
    val f = Features("y", Seq("x"), Seq("g"))
    val sigma = assembleViaEngine(tree, tables, f)
    assert(sigma.interceptIdx == 0)
    assert(sigma.contIdx("x") == 1)
    val catIdx = sigma.catValueIndex("g").values.toSeq.sorted
    assert(catIdx == (2 until 2 + catIdx.size))
    assert(sigma.labelIdx == sigma.dim - 1)
    assert(sigma.freeIdx == (0 until sigma.dim - 1))
  }

  test("one-hot diagonal blocks are the per-value counts") {
    val (tree, tables) = TestData.single(spark)
    val f = Features("y", Nil, Seq("g"))
    val sigma = assembleViaEngine(tree, tables, f)
    val d = Baselines.joinAll(tree, tables).collect()
    val counts = d.groupBy(_.getAs[Long]("g")).view.mapValues(_.length.toDouble).toMap
    counts.foreach { case (v, c) =>
      val i = sigma.catValueIndex("g")(v)
      assert(sigma.matrix(i, i) == c)
      assert(sigma.matrix(0, i) == c)
    }
    // Off-diagonal entries of one block are zero (disjoint one-hot values).
    val idxs = sigma.catValueIndex("g").values.toSeq
    for (i <- idxs; j <- idxs if i != j) assert(sigma.matrix(i, j) == 0.0)
  }
}
