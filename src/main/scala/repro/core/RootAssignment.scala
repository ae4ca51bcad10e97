package repro.core

/** The Find Roots layer (§3.3).
  *
  * LMFAO lets every query in the batch pick its own root in the (single) join
  * tree, trading per-query optimality against cross-query sharing. The
  * paper's heuristic, implemented verbatim:
  *
  *  - For each query Q, every relation R gets a weight equal to the fraction
  *    of Q's group-by attributes contained in R; a query without group-by
  *    attributes gives every relation the same weight 1/m.
  *  - Roots are then assigned in decreasing weight order: the relation with
  *    the largest accumulated weight becomes the root of every not-yet-rooted
  *    query that considered it a candidate. Ties break toward the larger
  *    relation (avoids building large views over the big fact table).
  */
object RootAssignment {

  /** Candidate roots for a query: relations holding at least one of its
    * group-by attributes, or all relations if it has none.
    */
  def candidates(tree: JoinTree, q: AggQuery): Seq[String] =
    if (q.groupBy.isEmpty) tree.relations.map(_.name)
    else {
      val c = tree.relations.map(_.name).filter(r => q.groupBy.exists(tree.attrsOf(r).contains))
      // A query can group by attributes spread over several relations; if no
      // single relation holds any (cannot happen for valid queries) fall back
      // to all relations.
      if (c.nonEmpty) c else tree.relations.map(_.name)
    }

  /** Assign one root per query. `sizes` are relation cardinalities (used only
    * to break weight ties).
    */
  def assign(tree: JoinTree, queries: Seq[AggQuery],
             sizes: Map[String, Long] = Map.empty): Map[String, String] = {
    val cand = queries.map(q => q.name -> candidates(tree, q)).toMap
    val weight = scala.collection.mutable.Map[String, Double]().withDefaultValue(0.0)
    for (q <- queries) {
      if (q.groupBy.isEmpty) {
        val w = 1.0 / tree.relations.size
        tree.relations.foreach(r => weight(r.name) += w)
      } else {
        for (r <- cand(q.name)) {
          val frac = q.groupBy.count(tree.attrsOf(r).contains).toDouble / q.groupBy.size
          weight(r) += frac
        }
      }
    }
    val order = tree.relations.map(_.name)
      .sortBy(r => (-weight(r), -sizes.getOrElse(r, 0L), r))
    val roots    = scala.collection.mutable.Map[String, String]()
    val unplaced = scala.collection.mutable.LinkedHashSet(queries.map(_.name): _*)
    for (r <- order if unplaced.nonEmpty) {
      val take = unplaced.filter(qn => cand(qn).contains(r)).toSeq
      take.foreach { qn => roots(qn) = r; unplaced -= qn }
    }
    roots.toMap
  }
}
