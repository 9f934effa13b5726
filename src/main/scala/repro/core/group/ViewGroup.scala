package repro.core.group

import repro.core.viewgen.{MergedView, QueryOutput, ViewId}

/** A multi-output view group: merged views / query outputs computed at the
  * same join-tree node, in the same direction, over the *same* set of incoming
  * views. All members share one join of the node's relation with those
  * incoming views (the paper's "multi-output execution plan … in one pass over
  * the relation at the node").
  *
  * Sharing one join frame is only sound when the incoming view sets coincide:
  * joining an extra view whose keys carry non-functional group-by attributes
  * would duplicate rows for the other members. LMFAO's trie-nested loops merge
  * more aggressively; the (node, direction, incoming-set) granularity is the
  * sound DataFrame-level equivalent (see DESIGN.md).
  *
  * `direction = Some(p)` groups views travelling to neighbour `p`;
  * `direction = None` groups query outputs rooted at the node.
  */
final case class ViewGroup(
    node: String,
    direction: Option[String],
    views: Seq[MergedView],
    outputs: Seq[QueryOutput],
) {
  require(views.nonEmpty || outputs.nonEmpty, "empty view group")
  require(direction.isEmpty || outputs.isEmpty, "directional groups carry no query outputs")
  require(views.forall(v => v.id.from == node && direction.contains(v.id.to)), "view outside its group")
  require(outputs.forall(_.root == node), "output outside its group")
  require(
    (views.map(_.incoming.toSet) ++ outputs.map(_.incoming.toSet)).distinct.size == 1,
    s"group members must share the same incoming views")

  /** Merged views this group reads (from other groups). */
  def incoming: Seq[ViewId] =
    (views.flatMap(_.incoming) ++ outputs.flatMap(_.incoming)).distinct

  def produced: Seq[ViewId] = views.map(_.id)

  def label: String =
    direction.map(d => s"$node->$d").getOrElse(s"$node(out:${outputs.map(_.query.name).mkString(",")})")
}
