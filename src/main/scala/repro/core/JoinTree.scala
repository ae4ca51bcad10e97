package repro.core

/** A relation in the database schema: its name and attribute list.
  * Attribute names are global: attributes shared between two relations are
  * (natural-)join attributes.
  */
final case class Relation(name: String, attrs: Seq[String]) {
  require(attrs.distinct.size == attrs.size, s"relation $name has duplicate attributes")
  def attrSet: Set[String] = attrs.toSet
}

/** A join tree over the database relations (§3.1): an undirected tree whose
  * nodes are the relations and that satisfies the running-intersection
  * property — for every attribute, the nodes containing it form a connected
  * subtree. Acyclic natural joins always admit one; cyclic schemas would
  * first be decomposed into a hypertree (out of evaluation scope here, all
  * four paper datasets are acyclic).
  */
final case class JoinTree(relations: Seq[Relation], edges: Seq[(String, String)]) {
  val byName: Map[String, Relation] = relations.map(r => r.name -> r).toMap
  require(byName.size == relations.size, "duplicate relation names")
  edges.foreach { case (a, b) =>
    require(byName.contains(a) && byName.contains(b), s"edge ($a,$b) references unknown relation")
    require(a != b, s"self-edge on $a")
  }

  /** Adjacency: neighbor lists in deterministic (insertion) order. */
  val adj: Map[String, Seq[String]] = {
    val m = scala.collection.mutable.LinkedHashMap[String, Vector[String]]()
    relations.foreach(r => m(r.name) = Vector.empty)
    edges.foreach { case (a, b) => m(a) :+= b; m(b) :+= a }
    m.toMap
  }

  def attrsOf(node: String): Set[String] = byName(node).attrSet

  /** All attributes of the database, in first-seen order. */
  val allAttrs: Seq[String] = relations.flatMap(_.attrs).distinct

  /** Natural-join attributes between two adjacent relations. */
  def joinAttrs(a: String, b: String): Seq[String] =
    byName(a).attrs.filter(byName(b).attrSet.contains)

  /** Nodes of the subtree rooted at `child` when the edge to `parent` is cut. */
  def subtreeNodes(child: String, parent: String): Set[String] = {
    val seen = scala.collection.mutable.Set(child, parent)
    val out  = scala.collection.mutable.Set(child)
    val q    = scala.collection.mutable.Queue(child)
    while (q.nonEmpty) {
      val n = q.dequeue()
      adj(n).foreach { m => if (!seen(m)) { seen += m; out += m; q.enqueue(m) } }
    }
    out.toSet
  }

  /** Attributes appearing anywhere in the subtree at `child` away from `parent`. */
  def subtreeAttrs(child: String, parent: String): Set[String] =
    subtreeNodes(child, parent).flatMap(attrsOf)

  /** Relations containing a given attribute. */
  def relationsOf(attr: String): Seq[String] =
    relations.filter(_.attrSet.contains(attr)).map(_.name)

  /** BFS order from `root` — used to build the natural join left-to-right so
    * that every joined relation shares attributes with the prefix.
    */
  def bfsOrder(root: String): Seq[String] = {
    require(byName.contains(root), s"unknown root $root")
    val seen = scala.collection.mutable.Set(root)
    val out  = scala.collection.mutable.ArrayBuffer(root)
    val q    = scala.collection.mutable.Queue(root)
    while (q.nonEmpty) {
      val n = q.dequeue()
      adj(n).foreach { m => if (!seen(m)) { seen += m; out += m; q.enqueue(m) } }
    }
    out.toSeq
  }

  /** Validate tree shape and the running-intersection property.
    * Returns the list of violations (empty = valid).
    */
  def validate: Seq[String] = {
    val errs = scala.collection.mutable.ArrayBuffer[String]()
    if (edges.size != relations.size - 1)
      errs += s"not a tree: ${relations.size} nodes but ${edges.size} edges"
    if (relations.nonEmpty && bfsOrder(relations.head.name).size != relations.size)
      errs += "not connected"
    // Running intersection: for each attribute the containing nodes form a
    // connected subgraph of the tree.
    for (a <- allAttrs) {
      val holders = relationsOf(a).toSet
      if (holders.size > 1) {
        val start = holders.head
        val seen  = scala.collection.mutable.Set(start)
        val q     = scala.collection.mutable.Queue(start)
        while (q.nonEmpty) {
          val n = q.dequeue()
          adj(n).foreach { m =>
            if (!seen(m) && holders(m)) { seen += m; q.enqueue(m) }
          }
        }
        if (seen.size != holders.size)
          errs += s"attribute $a violates running intersection (in ${holders.mkString(",")})"
      }
    }
    errs.toSeq
  }

  def requireValid(): JoinTree = {
    val errs = validate
    require(errs.isEmpty, s"invalid join tree:\n  ${errs.mkString("\n  ")}")
    this
  }
}
