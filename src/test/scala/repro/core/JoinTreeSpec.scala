package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.datasets.{Favorita, Retailer, SchemaDataset, TpcDs, Yelp}

class JoinTreeSpec extends AnyFunSuite {
  val allDatasets: Seq[SchemaDataset] = Seq(Retailer, Favorita, Yelp, TpcDs)

  for (ds <- allDatasets) {
    test(s"${ds.name}: join tree is a valid tree with running intersection") {
      assert(ds.tree.validate.isEmpty)
    }
    test(s"${ds.name}: every edge shares at least one join attribute") {
      for ((a, b) <- ds.tree.edges) assert(ds.tree.joinAttrs(a, b).nonEmpty, s"$a-$b")
    }
    test(s"${ds.name}: bfs order visits all relations exactly once") {
      val order = ds.tree.bfsOrder(ds.fact)
      assert(order.size == ds.tree.relations.size)
      assert(order.distinct.size == order.size)
      assert(order.head == ds.fact)
    }
    test(s"${ds.name}: declared feature attributes exist in the schema") {
      val all = ds.tree.allAttrs.toSet
      for (a <- ds.continuous ++ ds.categorical ++ ds.miAttrs ++ ds.cubeDims ++ ds.cubeMeasures)
        assert(all.contains(a), a)
      assert(all.contains(ds.label))
    }
    test(s"${ds.name}: keys, continuous and categorical partition distinct attrs") {
      assert(ds.continuous.intersect(ds.categorical).isEmpty)
      assert(ds.keys.intersect(ds.continuous).isEmpty)
      assert(ds.keys.intersect(ds.categorical).isEmpty)
    }
  }

  test("Retailer has 43 distinct attributes as in paper Table 1") {
    assert(Retailer.tree.allAttrs.size == 43)
  }
  test("Favorita has 18 distinct attributes as in paper Table 1") {
    assert(Favorita.tree.allAttrs.size == 18)
  }
  test("TPC-DS uses 10 relations as in paper Table 1") {
    assert(TpcDs.tree.relations.size == 10)
  }
  test("Yelp and Favorita relation counts match paper Table 1") {
    assert(Yelp.tree.relations.size == 5)
    assert(Favorita.tree.relations.size == 6)
    assert(Retailer.tree.relations.size == 5)
  }

  test("validate flags a cyclic edge set") {
    val t = JoinTree(
      Seq(Relation("A", Seq("x", "y")), Relation("B", Seq("y", "z")), Relation("C", Seq("z", "x"))),
      Seq("A" -> "B", "B" -> "C", "C" -> "A"))
    assert(t.validate.exists(_.contains("not a tree")))
  }

  test("validate flags a disconnected forest") {
    val t = JoinTree(
      Seq(Relation("A", Seq("x")), Relation("B", Seq("x")), Relation("C", Seq("y")), Relation("D", Seq("y"))),
      Seq("A" -> "B", "C" -> "D"))
    assert(t.validate.nonEmpty)
  }

  test("validate flags a running-intersection violation") {
    // x appears in A and C but not on the path node B.
    val t = JoinTree(
      Seq(Relation("A", Seq("x", "y")), Relation("B", Seq("y", "z")), Relation("C", Seq("z", "x"))),
      Seq("A" -> "B", "B" -> "C"))
    assert(t.validate.exists(_.contains("running intersection")))
  }

  test("subtreeAttrs excludes the parent side") {
    val t = Favorita.tree
    val sub = t.subtreeAttrs("Transactions", "Sales")
    assert(sub.contains("txns") && sub.contains("city") && sub.contains("oilprize"))
    assert(!sub.contains("unitsales") && !sub.contains("family"))
  }

  test("subtreeNodes on TPC-DS customer side") {
    val nodes = TpcDs.tree.subtreeNodes("customer", "store_sales")
    assert(nodes == Set("customer", "customer_address", "customer_demographics",
      "household_demographics", "income_band"))
  }

  test("joinAttrs are symmetric") {
    for (ds <- allDatasets; (a, b) <- ds.tree.edges)
      assert(ds.tree.joinAttrs(a, b).toSet == ds.tree.joinAttrs(b, a).toSet)
  }

  test("duplicate relation names are rejected") {
    intercept[IllegalArgumentException] {
      JoinTree(Seq(Relation("A", Seq("x")), Relation("A", Seq("y"))), Seq.empty)
    }
  }

  test("duplicate attributes within a relation are rejected") {
    intercept[IllegalArgumentException] { Relation("A", Seq("x", "x")) }
  }
}
