package repro.core

import repro.{Oracle, SparkSpec, TestData}
import repro.datasets.Favorita

/** The per-query baseline: correct against DuckDB, and structurally honest
  * (no sharing — each query is its own evaluation over the join).
  */
class FlatJoinServiceSpec extends SparkSpec {
  lazy val dfs = TestData.dfs(Favorita, spark)

  test("fullJoin column set is the union of all attributes") {
    val j = FlatJoinService.fullJoin(Favorita.tree, dfs)
    assert(j.columns.toSet == Favorita.tree.allAttrs.toSet)
  }

  test("fullJoin from any root yields the same cardinality") {
    val a = FlatJoinService.fullJoin(Favorita.tree, dfs).count()
    val b = FlatJoinService.fullJoin(Favorita.tree, dfs, Some("Oil")).count()
    assert(a == b)
  }

  for (cached <- Seq(true, false)) {
    test(s"baseline (cached=$cached) matches DuckDB on a group-by batch") {
      val svc = new FlatJoinService(spark, Favorita.tree, dfs, cached = cached)
      val batch = Seq(
        AggQuery("f_cnt", Seq.empty, Seq(NamedAgg("cnt", Nil))),
        AggQuery("f_fam", Seq("family"), Seq(NamedAgg("cnt", Nil), NamedAgg("s", Seq(Att("unitsales"))))),
      )
      val out = svc.run(batch)
      for (q <- batch)
        Oracle.assertEquivalent(out(q.name), SqlGen.querySql(Favorita.tree, q),
          TestData.tables(Favorita, spark): _*)
      svc.close()
    }
  }

  test("runOne on a scalar indicator query") {
    val svc = new FlatJoinService(spark, Favorita.tree, dfs)
    val q = AggQuery("q", Seq.empty, Seq(NamedAgg("a", Seq(Ind("oilprize", ">", "50"), Att("txns")))))
    Oracle.assertEquivalent(svc.runOne(q), SqlGen.querySql(Favorita.tree, q),
      TestData.tables(Favorita, spark): _*)
    svc.close()
  }

  test("SqlGen renders group-by and aliases for every aggregate") {
    val q = AggQuery("q", Seq("family", "city"), Seq(NamedAgg("a", Seq(Att("txns")))))
    val sql = SqlGen.querySql(Favorita.tree, q)
    assert(sql.contains("GROUP BY family, city"))
    assert(sql.contains("AS a"))
    assert(sql.contains("NATURAL JOIN"))
  }

  test("SqlGen scalar query has no GROUP BY") {
    val sql = SqlGen.querySql(Favorita.tree, AggQuery.count("q"))
    assert(!sql.contains("GROUP BY"))
  }
}
