package repro.bench

import repro.tables.{Table1, Workloads}

/** Reproduces paper Table 1: dataset characteristics at the bench SF. */
class Table1Bench extends BenchBase {

  lazy val rows = Table1.compute(spark, Workloads.benchSf)

  test("Table 1 renders for all four datasets") {
    emit("table1", Table1.render(rows) + s"(sf=${Workloads.benchSf})\n")
    assert(rows.size == 4)
  }

  test("Table 1 shape: Yelp join result blows up; snowflakes stay ~1x") {
    val byName = rows.map(r => r.dataset -> r).toMap
    assert(byName("Yelp").joinTuples > 5 * byName("Yelp").dbTuples / 2)
    for (d <- Seq("Retailer", "Favorita", "TPC-DS")) {
      val r = byName(d)
      assert(r.joinTuples <= r.dbTuples, s"$d join should not exceed db tuples (key joins)")
    }
  }

  test("Table 1 shape: join result is wider than the database (size amplification)") {
    // The flat join replicates dimension values per fact row (paper: 18GB vs
    // 1.5GB for Retailer).
    val byName = rows.map(r => r.dataset -> r).toMap
    for (d <- Seq("Retailer", "TPC-DS"))
      assert(byName(d).joinMb > byName(d).dbMb, s"$d: join ${byName(d).joinMb}MB vs db ${byName(d).dbMb}MB")
  }

  test("Table 1 relation/attribute counts match the paper exactly") {
    val byName = rows.map(r => r.dataset -> r).toMap
    assert(byName("Retailer").relations == 5 && byName("Retailer").attrs == 43)
    assert(byName("Favorita").relations == 6 && byName("Favorita").attrs == 18)
    assert(byName("Yelp").relations == 5)
    assert(byName("TPC-DS").relations == 10)
  }
}
