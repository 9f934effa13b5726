package repro.core.exec

import scala.collection.mutable

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions.{col, lit, sum}
import org.apache.spark.storage.StorageLevel

import repro.core.group.{DependencyGraph, ViewGroup}
import repro.core.query.{Factor, Predicate}
import repro.core.viewgen.{AggRef, Plan, QueryOutput, ViewId}

/** The LMFAO execution layer on Spark.
  *
  * Each multi-output view group becomes one join of the node's relation with
  * the group's incoming view frames; every merged view of the group is a
  * single `groupBy().agg()` pass over that shared frame, and *all query
  * outputs of the group that share a group-by list are combined into one
  * aggregate pass* (the paper's multi-output plans: e.g. the 36 scalar Σ
  * aggregates of a regression batch become one job). Every view is
  * materialised (cached), exactly as LMFAO's engine computes and stores each
  * view; Catalyst/Tungsten play the role of the paper's code-generation layer.
  */
object LmfaoExec {

  /** Execution result: per-query DataFrames plus the materialised views and
    * the groups that produced them (for inspection and benchmarks).
    */
  final case class Result(
      queryResults: Map[String, DataFrame],
      viewFrames: Map[ViewId, DataFrame],
      groups: Seq[ViewGroup],
      caches: Seq[DataFrame],
  ) {
    /** Unpersist every frame cached by the run. */
    def cleanup(): Unit = {
      viewFrames.values.foreach(_.unpersist())
      caches.foreach(_.unpersist())
    }
  }

  /** Run a plan over the given base relations.
    *
    * @param tables       one DataFrame per relation of the plan's join tree
    * @param persistViews allow caching of multi-consumer views and shared
    *                     group frames (on by default)
    */
  def run(tables: Map[String, DataFrame], plan: Plan, persistViews: Boolean = true): Result = {
    plan.tree.relations.foreach { r =>
      require(tables.contains(r.name), s"missing DataFrame for relation ${r.name}")
      r.attrs.foreach(a => require(tables(r.name).columns.contains(a),
        s"relation ${r.name} DataFrame is missing attribute $a"))
    }

    // Per-attribute predicates push down to every relation containing the
    // attribute (sound for natural joins; see DESIGN.md).
    val filters = plan.queries.flatMap(_.filters).distinct
    require(
      plan.queries.map(_.filters.toSet).distinct.size <= 1,
      "all queries of one batch must share the same filter set (CART node batches do)")
    val filtered = applyFilters(plan.tree, tables, filters)

    val groups = DependencyGraph.groups(plan)
    val viewFrames = mutable.Map.empty[ViewId, DataFrame]
    val queryResults = mutable.Map.empty[String, DataFrame]
    val caches = mutable.ArrayBuffer.empty[DataFrame]

    groups.foreach { g =>
      val base = filtered(g.node)
      val frame = g.incoming.foldLeft(base) { (acc, vid) =>
        val vf = viewFrames(vid)
        val keys = acc.columns.toSet intersect vid.keys.toSet
        require(keys.nonEmpty, s"no join keys between ${g.node} frame and ${vid.label}")
        acc.join(vf, keys.toSeq.sorted, "inner")
      }
      // One aggregate pass per merged view plus one per distinct output
      // group-by; share the join frame when there is more than one pass.
      val outputPasses = g.outputs.map(_.query.groupBy).distinct
      val passes = g.views.size + outputPasses.size
      val shared =
        if (persistViews && passes > 1 && g.incoming.nonEmpty) {
          val f = frame.persist(StorageLevel.MEMORY_AND_DISK)
          caches += f
          f
        } else frame

      // Materialise every view, as LMFAO itself does: empirically the cached
      // small aggregates beat re-inlining their subplans into each consumer
      // (and they are read by the dependency-graph successors).
      g.views.foreach { v =>
        val df = aggregate(shared, v.id.keys,
          v.aggs.map(a => (a.name, a.localFactors, a.childRefs)))
        viewFrames(v.id) =
          if (persistViews) df.persist(StorageLevel.MEMORY_AND_DISK) else df
      }

      // Multi-output pass: all queries of the group sharing a group-by list
      // are evaluated by one aggregate job.
      g.outputs.groupBy(_.query.groupBy).foreach { case (gb, outs) =>
        val aliased: Seq[(QueryOutput, Seq[(String, String)])] = outs.zipWithIndex.map {
          case (o, i) =>
            o -> o.query.measures.zip(o.terms).map { case (m, t) => (s"o${i}_${m.name}", m.name) }
        }
        val exprs = aliased.flatMap { case (o, names) =>
          o.query.measures.zip(o.terms).zip(names).map { case ((_, t), (alias, _)) =>
            sum(product(t.localFactors, t.childRefs)).as(alias)
          }
        }
        val combined =
          if (gb.isEmpty) shared.agg(exprs.head, exprs.tail: _*)
          else shared.groupBy(gb.map(col): _*).agg(exprs.head, exprs.tail: _*)
        val combinedShared =
          if (persistViews && outs.size > 1) {
            val f = combined.persist(StorageLevel.MEMORY_AND_DISK)
            caches += f
            f
          } else combined
        aliased.foreach { case (o, names) =>
          val cols = gb.map(col) ++ names.map { case (alias, name) => col(alias).as(name) }
          queryResults(o.query.name) =
            combinedShared.select(cols: _*).select(o.query.outputColumns.map(col): _*)
        }
      }
    }

    Result(queryResults.toMap, viewFrames.toMap, groups, caches.toSeq)
  }

  /** SUM(Π localFactors × Π childAggColumns) for each aggregate, grouped by `keys`. */
  private def aggregate(frame: DataFrame, keys: Seq[String],
                        aggs: Seq[(String, Seq[Factor], Seq[AggRef])]): DataFrame = {
    val exprs = aggs.map { case (name, factors, refs) => sum(product(factors, refs)).as(name) }
    if (keys.isEmpty) frame.agg(exprs.head, exprs.tail: _*)
    else frame.groupBy(keys.map(col): _*).agg(exprs.head, exprs.tail: _*)
  }

  private def product(factors: Seq[Factor], refs: Seq[AggRef]): Column = {
    val cols = factors.map(_.column) ++ refs.map(r => col(r.aggName))
    cols.foldLeft(lit(1.0))(_ * _)
  }

  /** Push each predicate to every relation that contains its attribute. */
  def applyFilters(tree: repro.core.schema.JoinTree, tables: Map[String, DataFrame],
                   filters: Seq[Predicate]): Map[String, DataFrame] =
    tables.map { case (name, df) =>
      val rel = tree.relationByName(name)
      val applicable = filters.filter(p => rel.has(p.attr))
      name -> applicable.foldLeft(df)((acc, p) => acc.where(p.column))
    }
}
