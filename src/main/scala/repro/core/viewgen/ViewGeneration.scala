package repro.core.viewgen

import scala.collection.mutable

import repro.core.query.AggQuery
import repro.core.schema.JoinTree

/** Sharing statistics of a generated plan — the quantities reproduced in
  * Table T1 (batch sizes and computation sharing).
  *
  * @param nQueries        queries in the batch
  * @param nAggregates     total measures across the batch
  * @param nUnmergedViews  views before merging: one per (query, edge) in each
  *                        query's root orientation
  * @param nMergedViews    merged views actually computed
  * @param nAggColumns     distinct aggregate columns across merged views after
  *                        signature dedup (shared partials counted once)
  * @param nGroups         multi-output view groups (see [[repro.core.group]])
  */
final case class SharingStats(
    nQueries: Int,
    nAggregates: Int,
    nUnmergedViews: Int,
    nMergedViews: Int,
    nAggColumns: Int,
    nGroups: Int,
)

/** The complete multi-query plan: merged views in a valid bottom-up
  * (dependency) order plus per-query root outputs.
  */
final case class Plan(
    tree: JoinTree,
    queries: Seq[AggQuery],
    roots: Map[String, String],
    views: Seq[MergedView],
    outputs: Seq[QueryOutput],
) {
  def viewById: Map[ViewId, MergedView] = views.map(v => v.id -> v).toMap

  def stats(nGroups: Int): SharingStats = SharingStats(
    nQueries = queries.size,
    nAggregates = queries.map(_.measures.size).sum,
    nUnmergedViews = queries.map(q => tree.relations.size - 1).sum,
    nMergedViews = views.size,
    nAggColumns = views.map(_.aggs.size).sum,
    nGroups = nGroups,
  )
}

/** The View Generation layer: decomposes every query of the batch into one
  * directional view per join-tree edge (top-down from the query's root) and
  * merges views with identical (direction, group-by keys), deduplicating
  * aggregate columns by recursive signature.
  */
object ViewGeneration {

  /** Builder state for one merged view. */
  private final class ViewBuilder(val id: ViewId, val index: Int) {
    val bySig = mutable.LinkedHashMap.empty[String, ViewAgg]
    def getOrAdd(sig: String, mk: String => ViewAgg): ViewAgg =
      bySig.getOrElseUpdate(sig, mk(s"v${index}_a${bySig.size}"))
    def build: MergedView = MergedView(id, bySig.values.toSeq)
  }

  def plan(tree: JoinTree, queries: Seq[AggQuery],
           rootOverrides: Map[String, String] = Map.empty): Plan = {
    require(queries.nonEmpty, "empty query batch")
    require(queries.map(_.name).distinct.size == queries.size, "duplicate query names in batch")
    queries.foreach { q =>
      q.attrs.foreach(a => require(tree.allAttrs.contains(a), s"query ${q.name}: unknown attribute $a"))
    }

    val roots = RootAssignment.assign(tree, queries, rootOverrides)
    val builders = mutable.LinkedHashMap.empty[ViewId, ViewBuilder]

    def builderFor(id: ViewId): ViewBuilder =
      builders.getOrElseUpdate(id, new ViewBuilder(id, builders.size))

    val outputs = queries.map { q =>
      val root = roots(q.name)
      val groupBySet = q.groupBy.toSet
      val edges = tree.bottomUpEdges(root)

      val terms = q.measures.map { m =>
        // partial-aggregate reference (and its canonical signature) produced
        // at each directed edge so far
        val edgeRef = mutable.Map.empty[(String, String), (AggRef, String)]
        edges.foreach { case (c, p) =>
          val keys = (tree.joinKeys(c, p).toSet ++ (groupBySet intersect tree.subtreeAttrs(c, p))).toSeq.sorted
          val id = ViewId(c, p, keys)
          val children = tree.neighbors(c).filterNot(_ == p).map(x => edgeRef((x, c)))
          val childRefs = children.map(_._1)
          val localFactors = m.factors.filter(f => tree.owner(f.attr) == c)
          val sig = signature(localFactors.map(_.tag), children.map { case (r, s) => (r.view, s) })
          val b = builderFor(id)
          val agg = b.getOrAdd(sig, name => ViewAgg(name, sig, localFactors, childRefs))
          edgeRef((c, p)) = (AggRef(id, agg.name), sig)
        }
        val childRefs = tree.neighbors(root).map(x => edgeRef((x, root))._1)
        val localFactors = m.factors.filter(f => tree.owner(f.attr) == root)
        MeasureTerm(localFactors, childRefs)
      }
      QueryOutput(q, root, terms)
    }

    val views = topoSort(builders.values.map(_.build).toSeq)
    Plan(tree, queries, roots, views, outputs)
  }

  /** Canonical signature of a partial aggregate: its local factors plus the
    * recursive signatures of the child partials it multiplies (wrapped in the
    * child view's identity). Independent of query and insertion order.
    */
  private def signature(factorTags: Seq[String], children: Seq[(ViewId, String)]): String = {
    val parts = factorTags.sorted ++ children.map { case (vid, s) => s"${vid.label}{$s}" }.sorted
    if (parts.isEmpty) "1" else parts.mkString("*")
  }

  /** Order merged views so every view appears after all views it reads.
    * The dependency relation (an edge view reads views one hop below, never
    * its own reverse) is acyclic because a cycle would be a non-backtracking
    * closed walk in a tree.
    */
  private def topoSort(views: Seq[MergedView]): Seq[MergedView] = {
    val byId = views.map(v => v.id -> v).toMap
    val visited = mutable.LinkedHashSet.empty[ViewId]
    def visit(id: ViewId): Unit = if (!visited.contains(id)) {
      byId(id).incoming.foreach(visit)
      visited += id
    }
    views.foreach(v => visit(v.id))
    visited.toSeq.map(byId)
  }
}
