package repro.core

import scala.collection.mutable

/** Reference to one aggregate column of one view: `(view id, aggregate name)`. */
final case class AggRef(view: Int, agg: String)

/** One aggregate carried by a view: the product of `local` factors (evaluated
  * on the view's own relation) and the aggregate columns of incoming child
  * views (`children`). The executor computes `SUM(local_1 * ... * child_1 * ...)`.
  *
  * The set of child views referenced (the *body signature*) identifies the
  * paper's view "body": two aggregates of the same `ViewSpec` may have
  * different bodies — that is exactly merge case (1), resolved by the
  * executor by joining per-body partials on the group-by attributes.
  */
final case class ViewAgg(name: String, local: Seq[Fx], children: Seq[AggRef]) {
  def signature: Seq[Int] = children.map(_.view).distinct.sorted
}

/** A (merged) directional view (§3.2): flows `from` → `to` along a join-tree
  * edge, or is a query output view rooted at `from` when `to` is None.
  * Aggregates accumulate across the batch (merge cases 2 and 3).
  */
final class ViewSpec(val id: Int, val from: String, val to: Option[String],
                     val groupBy: Seq[String]) {
  val aggs: mutable.ArrayBuffer[ViewAgg] = mutable.ArrayBuffer.empty
  def direction: String = to.map(t => s"$from->$t").getOrElse(s"$from (root)")
  override def toString: String =
    s"V$id[$direction](${groupBy.mkString(",")}; ${aggs.size} aggs)"
}

/** Output binding for one application query: which view holds its result and
  * how the view's internal aggregate names map to the query's names.
  */
final case class OutputSpec(query: AggQuery, view: Int, aggNames: Seq[(String, String)])

/** Statistics mirroring paper Table 2: application aggregates (A), synthesized
  * intermediate aggregates (I), merged views (V), view groups (G).
  */
final case class PlanStats(appAggs: Int, intermediateAggs: Int, views: Int, groups: Int) {
  override def toString: String = s"A=$appAggs I=$intermediateAggs V=$views G=$groups"
}

/** The fully planned batch. */
final case class Plan(tree: JoinTree, views: IndexedSeq[ViewSpec], outputs: Seq[OutputSpec],
                      roots: Map[String, String]) {

  /** Longest-path depth of each view in the view-dependency DAG (leaves = 0).
    * A view only depends on views of strictly smaller depth.
    */
  lazy val depths: Map[Int, Int] = {
    val memo = mutable.Map[Int, Int]()
    def d(id: Int): Int = memo.getOrElseUpdate(id, {
      val kids = views(id).aggs.flatMap(_.children.map(_.view)).distinct
      if (kids.isEmpty) 0 else kids.map(d).max + 1
    })
    views.foreach(v => d(v.id)); memo.toMap
  }

  /** View groups (§3.4): views out of the same node at the same dependency
    * depth. Within a group no view depends on another (they share a depth in
    * the longest-path layering), and the group DAG is acyclic by construction
    * since every dependency crosses to a strictly smaller depth.
    */
  lazy val groups: Seq[((String, Int), Seq[Int])] =
    views.groupBy(v => (v.from, depths(v.id))).view.mapValues(_.map(_.id).toSeq)
      .toSeq.sortBy { case ((n, d), _) => (d, n) }

  lazy val stats: PlanStats = {
    val a = outputs.map(_.aggNames.size).sum
    val outputViewIds = outputs.map(_.view).toSet
    val i = views.filter(v => !outputViewIds.contains(v.id)).map(_.aggs.size).sum
    PlanStats(a, i, views.size, groups.size)
  }

  def describe: String = {
    val sb = new StringBuilder
    sb ++= s"Plan over ${tree.relations.size} relations: $stats\n"
    for (((node, depth), vs) <- groups) {
      sb ++= s"  group(node=$node, depth=$depth): ${vs.map(views(_)).mkString(", ")}\n"
    }
    sb.result()
  }
}

/** The Aggregate Pushdown + Merge Views layers (§§3.2–3.4).
  *
  * For a query `Q(F; a)` rooted at S with children C_1..C_k, each product
  * aggregate decomposes into one directional view per edge: the view at
  * C_i → S groups by `(F ∩ attrs(T_i)) ∪ joinAttrs(S, C_i)` and carries the
  * partial product of the factors whose attributes live in the subtree T_i
  * (recursively decomposed the same way). Factors over attributes of S stay
  * local; every child contributes at least a count (join multiplicity).
  *
  * Merging: `merge = true` (default) memoizes views by (node, direction,
  * group-by) and deduplicates identical aggregates — cases (3), (2) and,
  * through per-signature execution, (1). `merge = false` materializes one
  * fresh view per (query, edge), the unshared AC/DC-style ablation.
  */
final class Planner(val tree: JoinTree, val merge: Boolean = true) {
  private val specs = mutable.ArrayBuffer[ViewSpec]()
  private val memo  = mutable.Map[(String, Option[String], Seq[String]), Int]()
  private val outs  = mutable.ArrayBuffer[OutputSpec]()

  private def specFor(node: String, to: Option[String], gb: Seq[String]): ViewSpec = {
    def create(): ViewSpec = {
      val s = new ViewSpec(specs.size, node, to, gb); specs += s; s
    }
    if (merge) specs(memo.getOrElseUpdate((node, to, gb), create().id)) else create()
  }

  private def addAgg(spec: ViewSpec, local: Seq[Fx], children: Seq[AggRef]): String = {
    if (merge) spec.aggs.find(a => a.local == local && a.children == children) match {
      case Some(existing) => existing.name  // merge case (3)
      case None =>
        val a = ViewAgg(s"a${spec.aggs.size}", local, children); spec.aggs += a; a.name
    } else {
      val a = ViewAgg(s"a${spec.aggs.size}", local, children); spec.aggs += a; a.name
    }
  }

  /** Split a product into node-local factors and per-child-subtree factors. */
  private def split(node: String, parent: Option[String], product: Seq[Fx])
      : (Seq[Fx], Map[String, Seq[Fx]]) = {
    val nodeAttrs = tree.attrsOf(node)
    val neighbors = tree.adj(node).filter(n => !parent.contains(n))
    val (local, rest) = product.partition(_.attrs.forall(nodeAttrs.contains))
    val byChild = mutable.Map[String, Vector[Fx]]().withDefaultValue(Vector.empty)
    for (f <- rest) {
      val home = neighbors.find(c => f.attrs.forall(tree.subtreeAttrs(c, node).contains))
      home match {
        case Some(c) => byChild(c) :+= f
        case None => throw new IllegalArgumentException(
          s"factor over ${f.attrs.mkString(",")} not coverable from $node " +
          s"(n-ary factors spanning subtrees are unsupported)")
      }
    }
    (local, byChild.toMap)
  }

  /** Build (or merge into) the directional view `child → parent` carrying the
    * given partial product, returning a reference to its aggregate column.
    */
  private def viewFor(child: String, parent: String, gbNeeded: Set[String],
                      product: Seq[Fx]): AggRef = {
    val jA    = tree.joinAttrs(child, parent)
    val extra = (gbNeeded intersect tree.subtreeAttrs(child, parent)) diff jA.toSet
    val gb    = jA ++ extra.toSeq.sorted
    val spec  = specFor(child, Some(parent), gb)
    val (local, byChild) = split(child, Some(parent), product)
    val kids = tree.adj(child).filter(_ != parent)
      .map(c => viewFor(c, child, gbNeeded, byChild.getOrElse(c, Seq.empty)))
    AggRef(spec.id, addAgg(spec, local, kids))
  }

  /** Plan one query of the batch at the given root. */
  def addQuery(q: AggQuery, root: String): Unit = {
    val known = tree.allAttrs.toSet
    val missing = q.attrs.diff(known)
    require(missing.isEmpty, s"query ${q.name} references unknown attributes: $missing")
    val gbCanon = q.groupBy.sorted
    val spec    = specFor(root, None, gbCanon)
    val mapping = q.aggs.map { na =>
      val (local, byChild) = split(root, None, na.product)
      val kids = tree.adj(root)
        .map(c => viewFor(c, root, q.groupBy.toSet, byChild.getOrElse(c, Seq.empty)))
      na.name -> addAgg(spec, local, kids)
    }
    outs += OutputSpec(q, spec.id, mapping)
  }

  def plan(roots: Map[String, String]): Plan = Plan(tree, specs.toIndexedSeq, outs.toSeq, roots)
}

object Planner {
  /** Plan a whole batch: assign roots (paper heuristic, or a forced single
    * root for the ablation) and decompose every query.
    */
  def planBatch(tree: JoinTree, queries: Seq[AggQuery],
                sizes: Map[String, Long] = Map.empty,
                merge: Boolean = true,
                forcedRoot: Option[String] = None): Plan = {
    require(queries.map(_.name).distinct.size == queries.size, "duplicate query names in batch")
    val roots = forcedRoot match {
      case Some(r) => queries.map(_.name -> r).toMap
      case None    => RootAssignment.assign(tree, queries, sizes)
    }
    val p = new Planner(tree, merge)
    queries.foreach(q => p.addQuery(q, roots(q.name)))
    p.plan(roots)
  }
}
