package repro.apps

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}
import repro.core._
import repro.datasets.{Favorita, Retailer}

/** End-to-end ridge linear regression: the LMFAO path must agree with the
  * closed form computed over the materialized join (the MADlib baseline),
  * and BGD must agree with the closed form — the paper's §4.2 accuracy
  * assertion ("same accuracy as the closed-form solution").
  */
class LinearRegressionSpec extends SparkSpec {

  def contFeats(ds: repro.datasets.SchemaDataset, n: Int): Seq[String] =
    (ds.label +: ds.continuous.filterNot(_ == ds.label).take(n - 1)).distinct

  for (ds <- Seq(Retailer, Favorita)) {
    lazy val dfs = TestData.dfs(ds, spark)
    lazy val joined = FlatJoinService.fullJoin(ds.tree, dfs).persist()

    test(s"${ds.name}: LMFAO closed form equals flat-join closed form (continuous)") {
      val cont = contFeats(ds, 5)
      val svc   = new LmfaoService(spark, ds.tree, dfs, TestData.sizes(ds, spark))
      val covar = CovarMatrix.compute(svc, cont, Seq.empty)
      svc.close()
      val m1 = LinearRegression.trainClosedForm(covar, ds.label, lambda = 1e-6)
      val m2 = LinearRegression.trainFlatGram(joined, cont, Seq.empty, ds.label, lambda = 1e-6)
      assert(m1.features == m2.features)
      for ((a, b) <- m1.theta.zip(m2.theta)) assert(math.abs(a - b) < 1e-6, "theta mismatch")
    }

    test(s"${ds.name}: BGD matches the closed form (paper's accuracy claim)") {
      // λ=0 so the Jacobi preconditioning in trainBgd preserves the optimum
      // exactly and both optimizers target the same OLS solution.
      val cont = contFeats(ds, 4)
      val svc   = new LmfaoService(spark, ds.tree, dfs)
      val covar = CovarMatrix.compute(svc, cont, Seq.empty)
      svc.close()
      val closed = LinearRegression.trainClosedForm(covar, ds.label, lambda = 0.0)
      val (bgd, iters) = LinearRegression.trainBgd(covar, ds.label, lambda = 0.0)
      assert(iters < 5000)
      val rc = closed.rmse(joined)
      val rb = bgd.rmse(joined)
      assert(math.abs(rc - rb) < 1e-3 * math.max(1.0, rc), s"closed=$rc bgd=$rb")
    }
  }

  test("Favorita: one-hot categorical model beats the continuous-only model in-sample") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val joined = FlatJoinService.fullJoin(ds.tree, dfs).persist()
    val cont = Seq(ds.label, "txns", "oilprize")
    val svc = new LmfaoService(spark, ds.tree, dfs)
    val covarPlain = CovarMatrix.compute(svc, cont, Seq.empty)
    val covarCat   = CovarMatrix.compute(svc, cont, Seq("perishable"))
    svc.close()
    val plain = LinearRegression.trainClosedForm(covarPlain, ds.label, 1e-6)
    val cat   = LinearRegression.trainClosedForm(covarCat, ds.label, 1e-6)
    // `perishable` is correlated with the demand signal by construction.
    assert(cat.rmse(joined) <= plain.rmse(joined) + 1e-9)
    joined.unpersist()
  }

  test("model beats the predict-the-mean baseline on held-out data (signal exists)") {
    val ds = Favorita
    val trainDfs = TestData.dfs(ds, spark)
    // Held-out data: a 3× larger draw from the same generative process (same
    // seed keeps the signal functions identical; re-seeding would change
    // E[label|features] itself). Training dimensions only cover a third of
    // the bigger key space, so the join keeps a mostly-fresh sample.
    val testDfs = trainDfs + (ds.fact -> ds.load(spark, TestData.SF * 3)(ds.fact))
    val testJoin = FlatJoinService.fullJoin(ds.tree, testDfs).persist()
    val svc = new LmfaoService(spark, ds.tree, trainDfs)
    val covar = CovarMatrix.compute(svc, Seq(ds.label, "txns", "oilprize", "class"),
      Seq("perishable", "family"))
    svc.close()
    val model = LinearRegression.trainClosedForm(covar, ds.label, 1e-6)
    val rmse = model.rmse(testJoin)
    val meanLabel = covar.moments(ds.label) / covar.count
    val baseRmse = math.sqrt(
      testJoin.select(avg(pow(col(ds.label).cast("double") - meanLabel, 2)))
        .collect()(0).getDouble(0))
    assert(rmse < baseRmse, s"model=$rmse mean-baseline=$baseRmse")
    testJoin.unpersist()
  }

  test("SGD epoch baseline runs and is at least directionally sane") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val joined = FlatJoinService.fullJoin(ds.tree, dfs)
    val shuffled = joined.orderBy(rand(1)).persist()
    shuffled.count()
    val cont = Seq(ds.label, "txns", "oilprize")
    val m = LinearRegression.sgdOneEpoch(shuffled, cont, ds.label, batchSize = 1000, step0 = 1e-6)
    assert(m.theta.length == cont.size) // intercept + 2 features
    assert(m.theta.forall(v => !v.isNaN && !v.isInfinite))
    shuffled.unpersist()
  }

  test("prediction column evaluates the dot product") {
    import CovarMatrix.FeatureIdx._
    val m = LinearRegression.Model(Seq(Intercept, Cont("x"), Cat("k", "a")), Array(1.0, 2.0, 10.0), "y")
    import spark.implicits._
    val df = Seq((3.0, "a", 0.0), (4.0, "b", 0.0)).toDF("x", "k", "y")
    val got = df.select(m.predictionCol).collect().map(_.getDouble(0)).toSeq
    assert(got == Seq(1.0 + 6.0 + 10.0, 1.0 + 8.0))
  }

  test("systemFrom excludes the label from the feature set") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val svc = new LmfaoService(spark, ds.tree, dfs)
    val covar = CovarMatrix.compute(svc, Seq(ds.label, "txns"), Seq.empty)
    svc.close()
    val (features, a, b, _, n) = LinearRegression.systemFrom(covar, ds.label)
    assert(!features.contains(CovarMatrix.FeatureIdx.Cont(ds.label)))
    assert(a.length == features.size && b.length == features.size && n > 0)
  }
}
