package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.datasets.{Favorita, Retailer}

class RootAssignmentSpec extends AnyFunSuite {

  /** Example 3.3's chain S_1(X_1,X_2) … S_{n-1}(X_{n-1},X_n). */
  def chain(n: Int): JoinTree = JoinTree(
    (1 until n).map(k => Relation(s"S$k", Seq(s"X$k", s"X${k + 1}"))),
    (1 until n - 1).map(k => s"S$k" -> s"S${k + 1}")).requireValid()

  test("scalar query roots at the largest relation") {
    val roots = RootAssignment.assign(Favorita.tree, Seq(AggQuery.count("q")),
      Map("Sales" -> 100L, "Transactions" -> 10L, "Stores" -> 1L,
          "Oil" -> 1L, "Holiday" -> 1L, "Items" -> 5L))
    assert(roots("q") == "Sales")
  }

  test("group-by query roots at a relation holding its group-by attribute") {
    val q = AggQuery("q", Seq("family"), Seq(NamedAgg("cnt", Nil)))
    val roots = RootAssignment.assign(Favorita.tree, Seq(q))
    assert(roots("q") == "Items")
  }

  test("candidates for a no-group-by query are all relations") {
    assert(RootAssignment.candidates(Favorita.tree, AggQuery.count("q")).size == 6)
  }

  test("candidates for a group-by query hold at least one group-by attribute") {
    val q = AggQuery("q", Seq("city", "family"), Seq(NamedAgg("cnt", Nil)))
    assert(RootAssignment.candidates(Favorita.tree, q).toSet == Set("Stores", "Items"))
  }

  test("chain: per-attribute count queries get per-relation roots (Example 3.3)") {
    val t = chain(6)
    val qs = (1 to 6).map(i => AggQuery(s"q$i", Seq(s"X$i"), Seq(NamedAgg("cnt", Nil))))
    val roots = RootAssignment.assign(t, qs)
    // Every query roots at a relation containing its group-by attribute.
    for (i <- 1 to 6)
      assert(t.attrsOf(roots(s"q$i")).contains(s"X$i"), s"q$i -> ${roots(s"q$i")}")
    // Multiple distinct roots are used — the whole point of the layer.
    assert(roots.values.toSet.size > 1)
  }

  test("shared weight pulls queries to a common root when possible") {
    // Two queries both mentioning store-side attributes should share a root.
    val q1 = AggQuery("q1", Seq("city"), Seq(NamedAgg("cnt", Nil)))
    val q2 = AggQuery("q2", Seq("city", "state"), Seq(NamedAgg("cnt", Nil)))
    val roots = RootAssignment.assign(Favorita.tree, Seq(q1, q2))
    assert(roots("q1") == "Stores" && roots("q2") == "Stores")
  }

  test("ties break toward the larger relation") {
    val roots = RootAssignment.assign(Retailer.tree, Seq(AggQuery.count("q")),
      Map("Inventory" -> 1000L, "Location" -> 10L, "Census" -> 5L, "Weather" -> 100L, "Item" -> 20L))
    assert(roots("q") == "Inventory")
  }

  test("every query in a mixed batch gets exactly one root") {
    val qs = Seq(
      AggQuery.count("a"),
      AggQuery("b", Seq("category"), Seq(NamedAgg("cnt", Nil))),
      AggQuery("c", Seq("rain", "category"), Seq(NamedAgg("cnt", Nil))),
      AggQuery("d", Seq("medianage"), Seq(NamedAgg("cnt", Nil))),
    )
    val roots = RootAssignment.assign(Retailer.tree, qs)
    assert(roots.keySet == qs.map(_.name).toSet)
    assert(roots.values.forall(Retailer.tree.byName.contains))
    // A rooted group-by query's root must be one of its candidates.
    for (q <- qs if q.groupBy.nonEmpty)
      assert(RootAssignment.candidates(Retailer.tree, q).contains(roots(q.name)))
  }
}
