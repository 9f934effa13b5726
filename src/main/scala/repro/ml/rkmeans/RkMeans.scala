package repro.ml.rkmeans

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.exec.LmfaoExec
import repro.core.query.{AggQuery, Measure}
import repro.core.schema.{JoinTree, Relation}
import repro.core.viewgen.ViewGeneration

/** Rk-means over the non-materialised join D (paper §3): a constant-factor
  * k-means approximation via a grid coreset.
  *
  *   Step 1  per-dimension weighted projections — n group-by count queries,
  *           run as ONE LMFAO batch (they share every count view);
  *   Step 2  weighted 1-d k-means per projection → assignment relations A_j;
  *   Step 3  grid coreset: GROUP BY C1..Cn SUM(1) over D ⋈ A_1 ⋈ … ⋈ A_n,
  *           realised by pushing each tiny A_j into the owner relation of X_j
  *           and running the coreset query through the engine;
  *   Step 4  weighted k-means on the coreset grid.
  */
object RkMeans {

  final case class Result(
      centroids: Array[Array[Double]],      // final k centroids over the dims
      dims: Seq[String],
      coresetSize: Long,                     // |G|: occupied grid points
      datasetSize: Double,                   // |D|
      perDimCentroids: Map[String, Array[Double]],
      coresetCost: Double,                   // step-4 objective on the coreset
  )

  def projectionQueries(dims: Seq[String]): Seq[AggQuery] =
    dims.map(a => AggQuery(s"rk_proj_$a", Seq(a), Seq(Measure.count(s"w_$a"))))

  def coresetQuery(dims: Seq[String]): AggQuery =
    AggQuery("rk_grid", dims.map(a => s"c_$a"), Seq(Measure.count("w_grid")))

  /** Steps 1–4. `kPerDim` is the number of 1-d clusters per projection (the
    * grid resolution), `k` the final cluster count.
    */
  def run(spark: SparkSession, tree: JoinTree, tables: Map[String, DataFrame],
          dims: Seq[String], k: Int, kPerDim: Int, seed: Long = 42): Result = {
    require(dims.nonEmpty, "need at least one clustering dimension")

    // Step 1: one LMFAO batch for all n projections.
    val projPlan = ViewGeneration.plan(tree, projectionQueries(dims))
    val projRes = LmfaoExec.run(tables, projPlan)
    val projections: Map[String, Seq[(Long, Double)]] = dims.map { a =>
      a -> projRes.queryResults(s"rk_proj_$a").collect()
        .map(r => (r.getAs[Any](a).toString.toLong, r.getAs[Double](s"w_$a")))
        .toSeq.sortBy(_._1)
    }.toMap
    projRes.cleanup()

    // Step 2: weighted 1-d k-means per dimension → assignment maps.
    val perDim: Map[String, WeightedKMeans.Model] = dims.map { a =>
      val pts = projections(a).map { case (v, _) => Array(v.toDouble) }.toArray
      val ws = projections(a).map(_._2).toArray
      a -> WeightedKMeans.fit(pts, ws, kPerDim, seed = seed + a.hashCode)
    }.toMap
    val assignments: Map[String, Map[Long, Long]] = dims.map { a =>
      a -> projections(a).map { case (v, _) => v -> perDim(a).assign(Array(v.toDouble)).toLong }.toMap
    }.toMap

    // Step 3: push each A_j into the owner relation of X_j, then one grid query.
    val (gridTree, gridTables) = augment(spark, tree, tables, dims, assignments)
    val gridPlan = ViewGeneration.plan(gridTree, Seq(coresetQuery(dims)))
    val gridRes = LmfaoExec.run(gridTables, gridPlan)
    val gridRows = gridRes.queryResults("rk_grid").collect()
    gridRes.cleanup()
    val gridPoints = gridRows.map { r =>
      dims.map(a => perDim(a).centroids(r.getAs[Any](s"c_$a").toString.toInt)(0)).toArray
    }
    val gridWeights = gridRows.map(_.getAs[Double]("w_grid"))
    val datasetSize = gridWeights.sum

    // Step 4: weighted k-means on the coreset.
    val finalModel = WeightedKMeans.fit(gridPoints, gridWeights, k, seed = seed)

    Result(
      centroids = finalModel.centroids,
      dims = dims,
      coresetSize = gridRows.length.toLong,
      datasetSize = datasetSize,
      perDimCentroids = dims.map(a => a -> perDim(a).centroids.map(_(0))).toMap,
      coresetCost = finalModel.cost,
    )
  }

  /** Extend the owner relation of each dimension with its centroid-assignment
    * column c_dim (a tiny value→cluster join), returning the augmented tree
    * and tables. The join tree shape is unchanged, so the running intersection
    * property is preserved.
    */
  def augment(spark: SparkSession, tree: JoinTree, tables: Map[String, DataFrame],
              dims: Seq[String], assignments: Map[String, Map[Long, Long]])
      : (JoinTree, Map[String, DataFrame]) = {
    import spark.implicits._
    var newTables = tables
    var newRelations = tree.relations
    dims.foreach { a =>
      val owner = tree.owner(a)
      val adf = assignments(a).toSeq.toDF(a, s"c_$a")
      newTables = newTables.updated(owner, newTables(owner).join(adf, Seq(a), "inner"))
      newRelations = newRelations.map { r =>
        if (r.name == owner) Relation(r.name, r.attrs :+ s"c_$a") else r
      }
    }
    (JoinTree(newRelations, tree.edges, tree.sizes), newTables)
  }

  /** Conventional Lloyd's over the full projected dataset, the paper's
    * quality comparator. The projection π_dims(D) (with multiplicities) is the
    * Step-1 result re-weighted per distinct tuple; for an exact comparator we
    * collect the distinct dim-tuples of D with their counts — identical
    * objective to running unweighted Lloyd's over all of D.
    */
  def fullLloyd(spark: SparkSession, tree: JoinTree, tables: Map[String, DataFrame],
                dims: Seq[String], k: Int, seed: Long = 42): WeightedKMeans.Model = {
    val q = AggQuery("lloyd_full", dims, Seq(Measure.count("w_full")))
    val plan = ViewGeneration.plan(tree, Seq(q))
    val res = LmfaoExec.run(tables, plan)
    val rows = res.queryResults("lloyd_full").collect()
    res.cleanup()
    val pts = rows.map(r => dims.map(a => r.getAs[Any](a).toString.toDouble).toArray)
    val ws = rows.map(_.getAs[Double]("w_full"))
    WeightedKMeans.fit(pts, ws, k, seed = seed)
  }

  /** Cost of centroids against the full weighted dataset (for the relative
    * approximation metric).
    */
  def fullCost(spark: SparkSession, tree: JoinTree, tables: Map[String, DataFrame],
               dims: Seq[String], centroids: Array[Array[Double]]): Double = {
    val q = AggQuery("cost_full", dims, Seq(Measure.count("w_cost")))
    val plan = ViewGeneration.plan(tree, Seq(q))
    val res = LmfaoExec.run(tables, plan)
    val rows = res.queryResults("cost_full").collect()
    res.cleanup()
    val pts = rows.map(r => dims.map(a => r.getAs[Any](a).toString.toDouble).toArray)
    val ws = rows.map(_.getAs[Double]("w_cost"))
    WeightedKMeans.cost(pts, ws, centroids)
  }
}
