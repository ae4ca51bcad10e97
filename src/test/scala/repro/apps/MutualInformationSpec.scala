package repro.apps

import repro.{Oracle, SparkSpec, TestData}
import repro.core._
import repro.datasets.{Favorita, Retailer}

/** Mutual information + Chow-Liu: information-theoretic invariants on
  * crafted single-relation data, oracle-checked counts on real trees, and
  * structure recovery of a planted dependency chain.
  */
class MutualInformationSpec extends SparkSpec {

  def miOf(rows: Seq[(String, String, String)], attrs: Seq[String] = Seq("a", "b", "c"))
      : Map[(String, String), Double] = {
    import spark.implicits._
    val df = rows.toDF(attrs: _*)
    val tr = JoinTree(Seq(Relation("T", attrs)), Seq.empty)
    val svc = new LmfaoService(spark, tr, Map("T" -> df))
    val mi = MutualInformation.compute(svc, attrs)
    svc.close()
    mi
  }

  test("batch size matches the closed formula") {
    for (n <- Seq(2, 5, 9)) {
      val attrs = (1 to n).map(i => s"a$i")
      val b = MutualInformation.batch(attrs)
      assert(b.size == MutualInformation.numAggregates(n))
      assert(b.map(_.aggs.size).sum == MutualInformation.numAggregates(n))
    }
  }

  test("independent attributes have ~zero MI") {
    // a and b fully independent on a product domain, uniformly covered.
    val rows = for (i <- 0 until 4; j <- 0 until 4; _ <- 0 until 5)
      yield (s"a$i", s"b$j", "x")
    val mi = miOf(rows)
    assert(math.abs(mi(("a", "b"))) < 1e-12)
  }

  test("identical attributes have MI equal to their entropy") {
    val rows = (0 until 100).map { i => val v = s"v${i % 4}"; (v, v, "x") }
    val mi = miOf(rows)
    val entropy = math.log(4) // uniform over 4 values
    assert(math.abs(mi(("a", "b")) - entropy) < 1e-9)
  }

  test("MI is non-negative on arbitrary data") {
    val rnd = new scala.util.Random(3)
    val rows = (0 until 300).map(_ => (s"a${rnd.nextInt(5)}", s"b${rnd.nextInt(4)}", s"c${rnd.nextInt(3)}"))
    val mi = miOf(rows)
    for ((p, v) <- mi) assert(v >= -1e-12, s"$p -> $v")
  }

  test("data-processing inequality direction: deterministic copy beats noisy copy") {
    val rnd = new scala.util.Random(5)
    val rows = (0 until 500).map { _ =>
      val a = rnd.nextInt(4)
      val clean = a.toString
      val noisy = if (rnd.nextDouble() < 0.3) rnd.nextInt(4).toString else a.toString
      (s"a$a", s"c$clean", s"n$noisy")
    }
    val mi = miOf(rows)
    assert(mi(("a", "b")) > mi(("a", "c")), s"clean=${mi(("a", "b"))} noisy=${mi(("a", "c"))}")
  }

  test("Chow-Liu recovers a planted dependency chain a -> b -> c -> d") {
    val rnd = new scala.util.Random(9)
    def flip(v: Int, p: Double, dom: Int): Int =
      if (rnd.nextDouble() < p) rnd.nextInt(dom) else v
    val rows = (0 until 2000).map { _ =>
      val a = rnd.nextInt(3)
      val b = flip(a, 0.1, 3)
      val c = flip(b, 0.1, 3)
      val d = flip(c, 0.1, 3)
      (s"v$a", s"v$b", s"v$c", s"v$d")
    }
    import spark.implicits._
    val attrs = Seq("a", "b", "c", "d")
    val df = rows.toDF(attrs: _*)
    val tr = JoinTree(Seq(Relation("T", attrs)), Seq.empty)
    val svc = new LmfaoService(spark, tr, Map("T" -> df))
    val mi = MutualInformation.compute(svc, attrs)
    svc.close()
    val edges = MutualInformation.chowLiu(mi, attrs)
      .map { case (x, y) => if (x < y) (x, y) else (y, x) }.toSet
    assert(edges == Set(("a", "b"), ("b", "c"), ("c", "d")), edges.toString)
  }

  test("chowLiu produces a spanning tree") {
    val attrs = (1 to 6).map(i => s"x$i")
    val rnd = new scala.util.Random(2)
    val mi = (for (i <- attrs.indices; j <- (i + 1) until attrs.size)
      yield (attrs(i), attrs(j)) -> rnd.nextDouble()).toMap
    val edges = MutualInformation.chowLiu(mi, attrs)
    assert(edges.size == attrs.size - 1)
    val reached = scala.collection.mutable.Set(attrs.head)
    var frontier = edges
    var progress = true
    while (progress) {
      val (in, out) = frontier.partition { case (a, b) => reached(a) || reached(b) }
      progress = in.nonEmpty
      in.foreach { case (a, b) => reached += a; reached += b }
      frontier = out
    }
    assert(reached.size == attrs.size)
  }

  for (ds <- Seq(Retailer, Favorita)) {
    test(s"${ds.name}: MI count queries match DuckDB (sampled pairs)") {
      val dfs = TestData.dfs(ds, spark)
      val attrs = ds.miAttrs.take(4)
      val svc = new LmfaoService(spark, ds.tree, dfs, TestData.sizes(ds, spark))
      val batch = MutualInformation.batch(attrs)
      val out = svc.run(batch)
      for (q <- batch)
        Oracle.assertEquivalent(out(q.name), SqlGen.querySql(ds.tree, q),
          TestData.tables(ds, spark): _*)
      svc.close()
    }

    test(s"${ds.name}: MI values agree between LMFAO and the flat baseline") {
      val dfs = TestData.dfs(ds, spark)
      val attrs = ds.miAttrs.take(5)
      val svc = new LmfaoService(spark, ds.tree, dfs)
      val mi1 = MutualInformation.compute(svc, attrs)
      svc.close()
      val flat = new FlatJoinService(spark, ds.tree, dfs, cached = true)
      val mi2 = MutualInformation.compute(flat, attrs)
      flat.close()
      for ((p, v) <- mi1) assert(math.abs(v - mi2(p)) < 1e-9, p.toString)
    }
  }
}
