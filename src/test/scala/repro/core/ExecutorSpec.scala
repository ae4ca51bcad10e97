package repro.core

import repro.{Oracle, SparkSpec, TestData}
import repro.datasets.{Favorita, Retailer, SchemaDataset, TpcDs, Yelp}

/** End-to-end engine correctness: every query batch evaluated by LMFAO is
  * diffed against DuckDB running the *unoptimized* SQL over the raw input
  * tables, and against the flat-join Spark baseline. Datasets are tiny
  * (SF=0.002) but join with full multiplicity.
  */
class ExecutorSpec extends SparkSpec {

  /** A representative per-dataset batch: scalar count, scalar products,
    * single-relation group-by, cross-relation group-by pair, indicator
    * products — the building blocks of every §2 application.
    */
  def representativeBatch(ds: SchemaDataset): Seq[AggQuery] = {
    val c1 = ds.continuous.head
    val c2 = ds.continuous(1 % ds.continuous.size)
    val k1 = ds.categorical.head
    val k2 = ds.categorical(1 % ds.categorical.size)
    Seq(
      AggQuery("b_count", Seq.empty, Seq(NamedAgg("cnt", Nil))),
      AggQuery("b_sums", Seq.empty, Seq(
        NamedAgg("s1", Seq(Att(c1))),
        NamedAgg("s2", Seq(Att(c2))),
        NamedAgg("p11", Seq(Pow(c1, 2))),
        NamedAgg("p12", Seq(Att(c1), Att(c2))))),
      AggQuery("b_cat1", Seq(k1), Seq(NamedAgg("cnt", Nil), NamedAgg("s1", Seq(Att(c1))))),
      AggQuery("b_cat2", Seq(k1, k2), Seq(NamedAgg("cnt", Nil))),
      AggQuery("b_ind", Seq.empty, Seq(
        NamedAgg("i1", Seq(Ind(c1, "<=", "20"))),
        NamedAgg("i2", Seq(Ind(c1, ">", "20"), Att(c2))),
        NamedAgg("i3", Seq(Ind(k1, "<>", "zzz", numeric = false))))),
      AggQuery("b_mixed", Seq(k2), Seq(NamedAgg("m", Seq(Att(c1), Ind(c2, ">=", "3"))))),
    )
  }

  val datasets: Seq[SchemaDataset] = Seq(Retailer, Favorita, Yelp, TpcDs)

  for (ds <- datasets) {
    lazy val dfs   = TestData.dfs(ds, spark)
    lazy val sizes = TestData.sizes(ds, spark)
    lazy val batch = representativeBatch(ds)
    lazy val svc   = new LmfaoService(spark, ds.tree, dfs, sizes)
    lazy val out   = svc.run(batch)

    for (q <- representativeBatch(ds)) {
      test(s"${ds.name}: LMFAO result for '${q.name}' matches DuckDB over raw tables") {
        Oracle.assertEquivalent(out(q.name), SqlGen.querySql(ds.tree, q),
          TestData.tables(ds, spark): _*)
      }
    }

    test(s"${ds.name}: LMFAO matches the flat-join baseline on the whole batch") {
      val flat    = new FlatJoinService(spark, ds.tree, dfs, cached = true)
      val flatOut = flat.run(batch)
      for (q <- batch) {
        val a = out(q.name).collect().map(_.toSeq.map(x => Option(x).map(_.toString).getOrElse("null")))
          .map(_.mkString("|")).sorted
        val b = flatOut(q.name).collect().map(_.toSeq.map(x => Option(x).map(_.toString).getOrElse("null")))
          .map(_.mkString("|")).sorted
        assert(a.toSeq == b.toSeq, s"query ${q.name}")
      }
      flat.close()
    }

    test(s"${ds.name}: ablation configs (single-root, unmerged, sequential) agree with default") {
      val configs = Seq(
        new LmfaoService(spark, ds.tree, dfs, sizes, multiRoot = false),
        new LmfaoService(spark, ds.tree, dfs, sizes, merge = false),
        new LmfaoService(spark, ds.tree, dfs, sizes, parallel = false),
      )
      val sample = batch.take(3)
      val expected = sample.map(q => q.name ->
        out(q.name).collect().map(_.toSeq.map(String.valueOf)).map(_.mkString("|")).sorted.toSeq).toMap
      for (cfg <- configs) {
        val o = cfg.run(sample)
        for (q <- sample) {
          val got = o(q.name).collect().map(_.toSeq.map(String.valueOf)).map(_.mkString("|")).sorted.toSeq
          assert(got == expected(q.name), s"query ${q.name}")
        }
        cfg.close()
      }
    }
  }

  // ---------- chain scenario of Example 3.3, executed ----------

  test("Example 3.3 chain: multi-root counts equal brute-force counts") {
    import org.apache.spark.sql.functions._
    val n = 5
    val t = JoinTree(
      (1 until n).map(k => Relation(s"S$k", Seq(s"X$k", s"X${k + 1}"))),
      (1 until n - 1).map(k => s"S$k" -> s"S${k + 1}")).requireValid()
    val dfs = (1 until n).map { k =>
      s"S$k" -> spark.range(200).select(
        repro.datasets.Gen.hint(6, k, col("id")) as s"X$k",
        repro.datasets.Gen.hint(6, k + 100, col("id")) as s"X${k + 1}")
    }.toMap
    val qs   = (1 to n).map(i => AggQuery(s"q$i", Seq(s"X$i"), Seq(NamedAgg("cnt", Nil))))
    val svc  = new LmfaoService(spark, t, dfs)
    val out  = svc.run(qs)
    val flat = new FlatJoinService(spark, t, dfs, cached = true)
    val fout = flat.run(qs)
    for (q <- qs) {
      val a = out(q.name).collect().map(r => (r.get(0).toString, r.getDouble(1))).sortBy(_._1).toSeq
      val b = fout(q.name).collect().map(r => (r.get(0).toString, r.getDouble(1))).sortBy(_._1).toSeq
      assert(a == b, q.name)
    }
    svc.close(); flat.close()
  }

  test("empty-intersection joins yield empty group-by results (no phantom rows)") {
    val t = JoinTree(
      Seq(Relation("A", Seq("k", "x")), Relation("B", Seq("k", "y"))), Seq("A" -> "B"))
    import spark.implicits._
    val dfs = Map(
      "A" -> Seq((1, 10), (2, 20)).toDF("k", "x"),
      "B" -> Seq((3, 1), (4, 2)).toDF("k", "y"))
    val svc = new LmfaoService(spark, t, dfs)
    val out = svc.run(Seq(AggQuery("g", Seq("k"), Seq(NamedAgg("cnt", Nil)))))
    assert(out("g").collect().isEmpty)
    svc.close()
  }

  test("join multiplicities are respected (many-to-many Yelp shape)") {
    val t = JoinTree(
      Seq(Relation("F", Seq("b", "v")), Relation("C", Seq("b", "c"))), Seq("F" -> "C"))
    import spark.implicits._
    val dfs = Map(
      "F" -> Seq((1, 5), (1, 7), (2, 11)).toDF("b", "v"),
      "C" -> Seq((1, 100), (1, 200), (1, 300), (2, 400)).toDF("b", "c"))
    val svc = new LmfaoService(spark, t, dfs)
    val out = svc.run(Seq(
      AggQuery("cnt", Seq.empty, Seq(NamedAgg("cnt", Nil))),
      AggQuery("sv", Seq.empty, Seq(NamedAgg("s", Seq(Att("v")))))))
    // b=1: 2 fact rows × 3 categories; b=2: 1 × 1 → 7 join rows
    assert(out("cnt").collect()(0).getDouble(0) == 7.0)
    assert(out("sv").collect()(0).getDouble(0) == (5 + 7) * 3.0 + 11.0)
    svc.close()
  }

  test("merge case (1) executor machinery: aggregates with different bodies in one view") {
    // Hand-built plan (the planner cannot produce this with unary factors,
    // see PlannerSpec): one output view at A whose two aggregates join
    // different incoming views — the executor must compute per-body partials
    // and join them on the group-by attributes (Example 3.4's W_T).
    import spark.implicits._
    val t = JoinTree(
      Seq(Relation("A", Seq("k", "x")), Relation("B", Seq("k", "y")), Relation("C", Seq("k", "z"))),
      Seq("A" -> "B", "A" -> "C"))
    val dfs = Map(
      "A" -> Seq((1, 2), (2, 3)).toDF("k", "x"),
      "B" -> Seq((1, 10), (1, 20), (2, 30)).toDF("k", "y"),
      "C" -> Seq((1, 5), (2, 6), (2, 7)).toDF("k", "z"))
    val vB = new ViewSpec(0, "B", Some("A"), Seq("k"))
    vB.aggs += ViewAgg("a0", Seq(Att("y")), Seq.empty)          // SUM(y) per k
    val vC = new ViewSpec(1, "C", Some("A"), Seq("k"))
    vC.aggs += ViewAgg("a0", Seq(Att("z")), Seq.empty)          // SUM(z) per k
    val out = new ViewSpec(2, "A", None, Seq("k"))
    out.aggs += ViewAgg("a0", Seq(Att("x")), Seq(AggRef(0, "a0"))) // body: A ⋈ V_B
    out.aggs += ViewAgg("a1", Seq(Att("x")), Seq(AggRef(1, "a0"))) // body: A ⋈ V_C
    assert(out.aggs.map(_.signature).distinct.size == 2)
    val q = AggQuery("w", Seq("k"), Seq(NamedAgg("s1", Nil), NamedAgg("s2", Nil)))
    val plan = Plan(t, IndexedSeq(vB, vC, out),
      Seq(OutputSpec(q, 2, Seq("s1" -> "a0", "s2" -> "a1"))), Map("w" -> "A"))
    val res = new Executor(spark, dfs).run(plan)
    val got = res.outputs("w").collect().map(r => (r.getInt(0), r.getDouble(1), r.getDouble(2)))
      .sortBy(_._1).toSeq
    // k=1: x=2, SUM(y)=30, SUM(z)=5 → (60, 10); k=2: x=3, SUM(y)=30, SUM(z)=13 → (90, 39)
    assert(got == Seq((1, 60.0, 10.0), (2, 90.0, 39.0)))
    res.close()
  }

  test("multiple aggregates over one view keep independent columns") {
    val ds  = Favorita
    val dfs = TestData.dfs(ds, spark)
    val svc = new LmfaoService(spark, ds.tree, dfs)
    val out = svc.run(Seq(AggQuery("q", Seq.empty, Seq(
      NamedAgg("a1", Seq(Att("oilprize"))),
      NamedAgg("a2", Seq(Pow("oilprize", 2))),
      NamedAgg("a3", Seq(Cst(3.0)))))))
    val r = out("q").collect()(0)
    assert(r.getDouble(2) > 0 && r.getDouble(0) > 0 && r.getDouble(1) >= r.getDouble(0))
    svc.close()
  }
}
