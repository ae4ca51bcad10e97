package repro.bench

import repro.tables.{Table4, Workloads}

/** Reproduces paper Table 4: LR and regression-tree training over Retailer
  * and Favorita, LMFAO vs the two-step baselines.
  */
class Table4Bench extends BenchBase {

  lazy val rows = Table4.compute(spark, Workloads.benchSf)

  test("Table 4 renders all prep/LR/RT rows for both datasets") {
    emit("table4", Table4.render(rows) +
      s"(sf=${Workloads.benchSf}, depth=${Workloads.treeDepth}, buckets=${Workloads.treeBuckets})\n")
    assert(rows.count(_.task == "LR") == 2 * 4)
    assert(rows.count(_.task == "RT") == 2 * 3)
  }

  test("Table 4 shape: LMFAO LR beats the flat OLS (MADlib proxy)") {
    // Paper factors are 10²–10³; at bench scale Spark constants compress
    // them — LMFAO must win outright on at least one dataset and stay within
    // 3× everywhere (see EXPERIMENTS.md on scale dependence).
    val ratios = for (ds <- Seq("Retailer", "Favorita")) yield {
      val lr = rows.filter(r => r.dataset == ds && r.task == "LR")
      val lmfao = lr.find(_.system == "LMFAO").get.seconds
      val mad   = lr.find(_.system == "Flat OLS (MADlib proxy)").get.seconds
      assert(lmfao < 3 * mad, s"$ds: LMFAO=$lmfao flat-OLS=$mad")
      lmfao / mad
    }
    assert(ratios.exists(_ < 1.0), s"LMFAO should win on at least one dataset: $ratios")
  }

  test("Table 4: LMFAO and MADlib-proxy models reach the same accuracy") {
    // Both notes carry rmse=...; they must agree to 3 decimals (paper §B:
    // "ensure that it is the same for LMFAO's model and the closed form").
    for (ds <- Seq("Retailer", "Favorita")) {
      val lr = rows.filter(r => r.dataset == ds && r.task == "LR")
      def rmse(sys: String): Double =
        lr.find(_.system == sys).get.note.stripPrefix("rmse=").toDouble
      val a = rmse("LMFAO")
      val b = rmse("Flat OLS (MADlib proxy)")
      assert(math.abs(a - b) < 5e-3 * math.max(1.0, b), s"$ds: lmfao=$a flat=$b")
    }
  }

  test("Table 4 shape: full-tree CART costs more than a single node") {
    for (ds <- Seq("Retailer", "Favorita")) {
      val rt = rows.filter(r => r.dataset == ds && r.task == "RT")
      val one  = rt.find(_.system.contains("1 node")).get.seconds
      val full = rt.find(r => r.system.startsWith("Flat CART d=")).get.seconds
      assert(full > one, s"$ds: full=$full one=$one")
    }
  }
}
