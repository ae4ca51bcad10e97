package repro.apps

import repro.{Oracle, SparkSpec, TestData}
import repro.core._
import repro.datasets.{Favorita, Retailer, SchemaDataset, Yelp}

/** Covar batches: closed-form aggregate counts (Table 2's A), oracle-checked
  * results, and gram-matrix assembly equal to a direct flat computation.
  */
class CovarMatrixSpec extends SparkSpec {

  test("batch size matches the closed formula") {
    for ((nc, nk) <- Seq((3, 2), (5, 0), (0, 3), (10, 4))) {
      val cont = (1 to nc).map(i => s"c$i")
      val cat  = (1 to nk).map(i => s"k$i")
      val b = try CovarMatrix.batch(cont, cat) catch { case _: IllegalArgumentException => Seq.empty }
      if (b.nonEmpty)
        assert(b.map(_.aggs.size).sum == CovarMatrix.numAggregates(nc, nk), s"nc=$nc nk=$nk")
    }
  }

  test("query names are unique across the batch") {
    val b = CovarMatrix.batch(Seq("a", "b"), Seq("x", "y", "z"))
    assert(b.map(_.name).distinct.size == b.size)
  }

  test("Retailer covar batch matches the paper's order of magnitude (~800 aggregates)") {
    val a = CovarMatrix.numAggregates(Retailer.continuous.size, Retailer.categorical.size)
    assert(a > 600 && a < 1100, s"A=$a (paper: 814)")
  }

  // Small feature subsets keep the oracle fast while covering every query shape.
  def subset(ds: SchemaDataset): (Seq[String], Seq[String]) =
    (ds.continuous.take(3), ds.categorical.take(2))

  for (ds <- Seq(Retailer, Favorita, Yelp)) {
    test(s"${ds.name}: every covar query matches DuckDB") {
      val dfs = TestData.dfs(ds, spark)
      val (cont, cat) = subset(ds)
      val svc = new LmfaoService(spark, ds.tree, dfs, TestData.sizes(ds, spark))
      val out = svc.run(CovarMatrix.batch(cont, cat))
      for (q <- CovarMatrix.batch(cont, cat))
        Oracle.assertEquivalent(out(q.name), SqlGen.querySql(ds.tree, q),
          TestData.tables(ds, spark): _*)
      svc.close()
    }
  }

  test("Favorita: assembled gram matrix equals the direct flat-join gram matrix") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val (cont, cat) = (Seq("unitsales", "txns", "oilprize"), Seq("stype", "perishable"))
    val svc   = new LmfaoService(spark, ds.tree, dfs, TestData.sizes(ds, spark))
    val covar = CovarMatrix.compute(svc, cont, cat)
    svc.close()

    val flatSvc = new FlatJoinService(spark, ds.tree, dfs, cached = true)
    val flatCovar = CovarMatrix.compute(flatSvc, cont, cat)
    flatSvc.close()

    assert(covar.count == flatCovar.count)
    assert(covar.oneHot == flatCovar.oneHot)
    for (f1 <- covar.oneHot; f2 <- covar.oneHot)
      assert(covar.gram(f1, f2) == flatCovar.gram(f1, f2), s"gram($f1, $f2)")
  }

  test("gram matrix is symmetric and count-consistent") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val (cont, cat) = (Seq("unitsales", "oilprize"), Seq("stype"))
    val svc   = new LmfaoService(spark, ds.tree, dfs)
    val covar = CovarMatrix.compute(svc, cont, cat)
    svc.close()
    import CovarMatrix.FeatureIdx
    for (f1 <- covar.oneHot; f2 <- covar.oneHot)
      assert(covar.gram(f1, f2) == covar.gram(f2, f1))
    // One-hot counts of a categorical sum to the total count.
    val catSum = covar.oneHot.collect { case f @ FeatureIdx.Cat("stype", _) =>
      covar.gram(FeatureIdx.Intercept, f) }.sum
    assert(catSum == covar.count)
    // Same-categorical cross terms vanish.
    val stypes = covar.oneHot.collect { case f @ FeatureIdx.Cat("stype", _) => f }
    for (a <- stypes; b <- stypes if a != b) assert(covar.gram(a, b) == 0.0)
  }

  test("covar diagonal dominates (second moments are sums of squares)") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val svc = new LmfaoService(spark, ds.tree, dfs)
    val covar = CovarMatrix.compute(svc, Seq("unitsales", "txns"), Seq.empty)
    svc.close()
    assert(covar.prod("unitsales", "unitsales") > 0)
    assert(covar.prod("txns", "txns") > 0)
    // Cauchy–Schwarz on the second-moment matrix.
    val c2 = covar.prod("unitsales", "txns")
    assert(c2 * c2 <= covar.prod("unitsales", "unitsales") * covar.prod("txns", "txns"))
  }
}
