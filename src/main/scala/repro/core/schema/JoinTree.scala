package repro.core.schema

/** A join tree over a set of relations (LMFAO's "backbone of the plan").
  *
  * Nodes are relations; an (undirected) edge means the two relations are
  * natural-joined on their shared attributes. The tree must be connected,
  * acyclic, and satisfy the running intersection property (every attribute's
  * set of relations forms a connected subtree), which makes directional-view
  * decomposition sound.
  *
  * `sizes` are cardinality hints (paper: "cardinality constraints") consumed
  * by the root-assignment heuristic; they do not affect correctness.
  */
final case class JoinTree(
    relations: Seq[Relation],
    edges: Seq[(String, String)],
    sizes: Map[String, Long] = Map.empty,
) {
  require(relations.nonEmpty, "join tree must have at least one relation")
  require(relations.map(_.name).distinct.size == relations.size, "duplicate relation names")

  val relationByName: Map[String, Relation] = relations.map(r => r.name -> r).toMap

  edges.foreach { case (a, b) =>
    require(relationByName.contains(a) && relationByName.contains(b), s"edge ($a,$b) references unknown relation")
    require(a != b, s"self edge on $a")
    require(joinKeys(a, b).nonEmpty, s"edge ($a,$b) has no shared attributes")
  }
  require(edges.size == relations.size - 1, s"a tree over ${relations.size} nodes needs ${relations.size - 1} edges, got ${edges.size}")

  /** Adjacency over the undirected tree. */
  val neighbors: Map[String, Seq[String]] = {
    val m = scala.collection.mutable.Map.empty[String, Vector[String]].withDefaultValue(Vector.empty)
    edges.foreach { case (a, b) => m(a) = m(a) :+ b; m(b) = m(b) :+ a }
    relations.map(r => r.name -> m(r.name)).toMap
  }

  // Connectivity (and therefore, with the edge count check, acyclicity).
  require(reachableFrom(relations.head.name).size == relations.size, "join tree is not connected")

  /** All attributes appearing anywhere in the tree. */
  val allAttrs: Set[String] = relations.flatMap(_.attrs).toSet

  /** Canonical owner of an attribute: the first relation in schema order that
    * contains it. Every unary aggregate factor over the attribute is evaluated
    * exactly once, at its owner node.
    */
  val owner: Map[String, String] =
    allAttrs.map(a => a -> relations.find(_.has(a)).get.name).toMap

  // Running intersection property: relations containing attribute a induce a
  // connected subgraph of the tree.
  allAttrs.foreach { a =>
    val holders = relations.filter(_.has(a)).map(_.name).toSet
    val seen = scala.collection.mutable.Set(holders.head)
    val stack = scala.collection.mutable.Stack(holders.head)
    while (stack.nonEmpty) {
      val n = stack.pop()
      neighbors(n).foreach { m => if (holders.contains(m) && !seen.contains(m)) { seen += m; stack.push(m) } }
    }
    require(seen == holders, s"running intersection violated for attribute $a (relations ${holders.mkString(",")})")
  }

  private def reachableFrom(start: String): Set[String] = {
    val seen = scala.collection.mutable.Set(start)
    val stack = scala.collection.mutable.Stack(start)
    while (stack.nonEmpty) {
      val n = stack.pop()
      neighbors(n).foreach { m => if (!seen.contains(m)) { seen += m; stack.push(m) } }
    }
    seen.toSet
  }

  /** Natural-join attributes between two adjacent relations. */
  def joinKeys(a: String, b: String): Seq[String] =
    relationByName(a).attrs.filter(relationByName(b).attrSet.contains)

  def sizeOf(name: String): Long = sizes.getOrElse(name, 1L)

  /** Relations on `child`'s side of the (child, parent) edge, child included. */
  def subtreeNodes(child: String, parent: String): Set[String] = {
    require(neighbors(child).contains(parent), s"($child,$parent) is not an edge")
    val seen = scala.collection.mutable.Set(child)
    val stack = scala.collection.mutable.Stack(child)
    while (stack.nonEmpty) {
      val n = stack.pop()
      neighbors(n).foreach { m =>
        val crossesCut = n == child && m == parent
        if (!crossesCut && !seen.contains(m)) { seen += m; stack.push(m) }
      }
    }
    seen.toSet
  }

  /** Attributes visible in the subtree on `child`'s side of (child, parent). */
  def subtreeAttrs(child: String, parent: String): Set[String] =
    subtreeNodes(child, parent).flatMap(n => relationByName(n).attrSet)

  /** Directed edges (child -> parent) in bottom-up order when the tree is
    * rooted at `root`: every edge appears after all edges below it.
    */
  def bottomUpEdges(root: String): Seq[(String, String)] = {
    require(relationByName.contains(root), s"unknown root $root")
    val out = scala.collection.mutable.ArrayBuffer.empty[(String, String)]
    def visit(node: String, parent: Option[String]): Unit = {
      neighbors(node).filterNot(parent.contains).foreach { c =>
        visit(c, Some(node))
        out += ((c, node))
      }
    }
    visit(root, None)
    out.toSeq
  }

  /** Children of `node` when rooted at `root` (neighbors away from the root). */
  def childrenToward(node: String, root: String): Seq[String] = {
    if (node == root) neighbors(node)
    else {
      val p = parentToward(node, root)
      neighbors(node).filterNot(_ == p)
    }
  }

  /** Parent of `node` on the path to `root`; errors if node == root. */
  def parentToward(node: String, root: String): String = {
    require(node != root, s"$node is the root")
    // BFS from root; parent of n is its predecessor.
    val parent = scala.collection.mutable.Map.empty[String, String]
    val queue = scala.collection.mutable.Queue(root)
    val seen = scala.collection.mutable.Set(root)
    while (queue.nonEmpty) {
      val n = queue.dequeue()
      neighbors(n).foreach { m => if (!seen.contains(m)) { seen += m; parent(m) = n; queue += m } }
    }
    parent(node)
  }
}
