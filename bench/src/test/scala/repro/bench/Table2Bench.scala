package repro.bench

import repro.tables.{Table2, Workloads}

/** Reproduces paper Table 2: batch statistics (A, I, V, G, output size). */
class Table2Bench extends BenchBase {

  lazy val rows = Table2.compute(spark, Workloads.benchSf)

  test("Table 2 renders for all dataset × workload combinations") {
    emit("table2", Table2.render(rows) + s"(sf=${Workloads.benchSf})\n")
    assert(rows.size == 4 * 4) // 4 datasets × {CM, RT, MI, DC}
  }

  test("Table 2 shape: views are far fewer than aggregates × edges (merging works)") {
    for (r <- rows if r.workload == "Covar Matrix") {
      assert(r.v < r.a, s"${r.dataset}: V=${r.v} should be well below A=${r.a}")
      assert(r.v <= 300, s"${r.dataset}: V=${r.v}")
    }
  }

  test("Table 2 shape: covar batches have hundreds-to-thousands of aggregates") {
    val cm = rows.filter(_.workload == "Covar Matrix")
    assert(cm.forall(_.a >= 100))
    val retailer = cm.find(_.dataset == "Retailer").get
    assert(retailer.a > 600 && retailer.a < 1100, s"A=${retailer.a} (paper: 814)")
  }

  test("Table 2 shape: data-cube batches have exactly 2^3 x 5 = 40 aggregates") {
    assert(rows.filter(_.workload == "Data Cube").forall(_.a == 40))
  }

  test("Table 2: groups form a small partition of the views") {
    for (r <- rows) {
      assert(r.g >= 1 && r.g <= r.v, s"${r.dataset}/${r.workload}: G=${r.g} V=${r.v}")
    }
  }
}
