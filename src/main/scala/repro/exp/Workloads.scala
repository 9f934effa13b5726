package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.storage.StorageLevel

import repro.core.schema.JoinTree
import repro.data.{Favorita, Retailer}
import repro.ml.linreg.Features
import repro.ml.tree.{FeatureKind, TreeFeature}

/** The feature-extraction workloads shared by the experiments (T1-T5). */
object Workloads {

  /** Ridge-regression features over Retailer (label: inventory units). */
  val retailerLr: Features = Features(
    label = "inventoryunits",
    continuous = Seq("prize", "maxtemp", "mintemp", "population", "medianage", "households"),
    categorical = Seq("category", "rain", "snow", "thunder", "rgn"),
  )

  /** Ridge-regression features over Favorita (label: units sold). */
  val favoritaLr: Features = Features(
    label = "units",
    continuous = Seq("txns", "oilprize"),
    categorical = Seq("family", "city", "htype", "promo"),
  )

  /** CART features over Retailer (label: inventory units). */
  val retailerDt: Seq[TreeFeature] = Seq(
    TreeFeature("prize", FeatureKind.Continuous),
    TreeFeature("maxtemp", FeatureKind.Continuous),
    TreeFeature("population", FeatureKind.Continuous),
    TreeFeature("category", FeatureKind.Categorical),
    TreeFeature("rain", FeatureKind.Categorical),
    TreeFeature("snow", FeatureKind.Categorical),
    TreeFeature("rgn", FeatureKind.Categorical),
  )
  val retailerDtLabel = "inventoryunits"

  /** Rk-means dimensions over Favorita (all continuous, cross-relation). */
  val favoritaRkDims: Seq[String] = Seq("units", "txns", "oilprize")

  /** A dataset instance with cached base relations. */
  final case class Dataset(name: String, tree: JoinTree, tables: Map[String, DataFrame]) {
    def cache(): Dataset = {
      tables.values.foreach(_.persist(StorageLevel.MEMORY_AND_DISK).count())
      this
    }
    def uncache(): Unit = tables.values.foreach(_.unpersist())
  }

  def favorita(spark: SparkSession, sf: Double): Dataset =
    Dataset("Favorita", Favorita.tree(sf), Favorita.tables(spark, sf))

  def retailer(spark: SparkSession, sf: Double): Dataset =
    Dataset("Retailer", Retailer.tree(sf), Retailer.tables(spark, sf))

  /** Benchmark scale factor: REPRO_SF env var, defaulting to 0.1 (~100 MB). */
  def benchSf: Double = sys.env.get("REPRO_SF").map(_.toDouble).getOrElse(0.1)
}
