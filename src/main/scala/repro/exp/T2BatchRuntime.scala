package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core.baseline.Baselines
import repro.core.exec.LmfaoExec
import repro.core.viewgen.ViewGeneration
import repro.ml.linreg.SigmaBatch
import repro.util.{Table, Timing}

/** T2 - Runtime of a full aggregate batch: LMFAO vs. the mainstream
  * strategies (paper sec 1: LMFAO outperforms engines that evaluate each
  * aggregate separately "by several orders of magnitude"; the expected shape
  * here is LMFAO < shared-join < per-query, with the per-query gap growing
  * with batch size).
  */
object T2BatchRuntime {

  final case class Row(dataset: String, method: String, queries: Int, seconds: Double)

  def measure(ds: Workloads.Dataset, queries: Seq[repro.core.query.AggQuery],
              methods: Set[String]): Seq[Row] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[Row]

    if (methods("lmfao")) {
      val (_, t) = Timing.timed {
        val plan = ViewGeneration.plan(ds.tree, queries)
        val res = LmfaoExec.run(ds.tables, plan)
        res.queryResults.values.foreach(_.collect())
        res.cleanup()
      }
      out += Row(ds.name, "LMFAO", queries.size, t)
    }
    if (methods("sharedjoin")) {
      val (_, t) = Timing.timed {
        val (d, results) = Baselines.runSharedJoin(ds.tree, ds.tables, queries)
        results.values.foreach(_.collect())
        d.unpersist()
      }
      out += Row(ds.name, "SharedJoin", queries.size, t)
    }
    if (methods("perquery")) {
      val (_, t) = Timing.timed {
        Baselines.runPerQuery(ds.tree, ds.tables, queries).values.foreach(_.collect())
      }
      out += Row(ds.name, "PerQuery", queries.size, t)
    }
    out.toSeq
  }

  def run(spark: SparkSession, sf: Double): Table = {
    val methods = Set("lmfao", "sharedjoin", "perquery")
    val rows = Seq(
      (Workloads.favorita(spark, sf), SigmaBatch.queries(Workloads.favoritaLr)),
      (Workloads.retailer(spark, sf), SigmaBatch.queries(Workloads.retailerLr)),
    ).flatMap { case (ds, queries) =>
      ds.cache()
      val measured = measure(ds, queries, methods)
      ds.uncache()
      val perQuery = measured.find(_.method == "PerQuery").map(_.seconds)
      measured.map { r =>
        Seq(r.dataset, r.method, r.queries.toString, Timing.fmt(r.seconds),
          perQuery.map(pq => f"${pq / r.seconds}%.1fx").getOrElse("-"))
      }
    }
    Table(
      s"T2: LR aggregate-batch runtime at SF=$sf (lower is better)",
      Seq("dataset", "method", "queries", "seconds", "speedup vs PerQuery"),
      rows,
      notes = Seq(
        "Paper claim: evaluating the batch with shared views beats per-aggregate",
        "execution by orders of magnitude on large batches; shape reproduced if",
        "LMFAO < SharedJoin < PerQuery with a widening per-query gap.",
      ),
    )
  }
}
