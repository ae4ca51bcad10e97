package repro.apps

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestData}
import repro.core._
import repro.datasets.{Favorita, Retailer, TpcDs}

/** Data cubes: 2^k batch structure, equality with Spark's native CUBE and
  * with DuckDB GROUPING SETS, and the ALL-value 1NF assembly.
  */
class DataCubeSpec extends SparkSpec {

  test("subsets enumerates the full powerset in stable order") {
    val s = DataCube.subsets(Seq("a", "b", "c"))
    assert(s.size == 8)
    assert(s.map(_.toSet).distinct.size == 8)
    assert(s.head.isEmpty)
  }

  test("batch has 2^k queries with v aggregates each (paper: 40 for k=3, v=5)") {
    val b = DataCube.batch(Seq("d1", "d2", "d3"), (1 to 5).map(i => s"m$i"))
    assert(b.size == 8)
    assert(b.map(_.aggs.size).sum == 40)
    assert(DataCube.numAggregates(3, 5) == 40)
  }

  for (ds <- Seq(Retailer, Favorita, TpcDs)) {
    test(s"${ds.name}: every cube group-by matches DuckDB") {
      val dfs = TestData.dfs(ds, spark)
      val svc = new LmfaoService(spark, ds.tree, dfs, TestData.sizes(ds, spark))
      val batch = DataCube.batch(ds.cubeDims, ds.cubeMeasures)
      val out = svc.run(batch)
      for (q <- batch)
        Oracle.assertEquivalent(out(q.name), SqlGen.querySql(ds.tree, q),
          TestData.tables(ds, spark): _*)
      svc.close()
    }
  }

  test("Favorita: assembled 1NF cube equals Spark's native CUBE operator") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val svc = new LmfaoService(spark, ds.tree, dfs)
    val cube = DataCube.compute(svc, ds.cubeDims, ds.cubeMeasures)
    svc.close()

    val joined = FlatJoinService.fullJoin(ds.tree, dfs)
    val native = joined
      .cube(ds.cubeDims.map(col): _*)
      .agg(sum(col(ds.cubeMeasures.head).cast("double")).as(DataCube.measureName(ds.cubeMeasures.head)),
        ds.cubeMeasures.tail.map(m => sum(col(m).cast("double")).as(DataCube.measureName(m))): _*)
      .select(
        ds.cubeDims.map(d => coalesce(col(d).cast("string"), lit("ALL")).as(d)) ++
          ds.cubeMeasures.map(m => col(DataCube.measureName(m))): _*)

    def canon(df: org.apache.spark.sql.DataFrame): Seq[String] =
      df.collect().map(_.toSeq.map {
        case d: Double => f"$d%.4f"
        case x         => String.valueOf(x)
      }.mkString("|")).sorted.toSeq
    assert(canon(cube) == canon(native))
  }

  test("cube ALL row equals the grand total") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val svc = new LmfaoService(spark, ds.tree, dfs)
    val cube = DataCube.compute(svc, ds.cubeDims, ds.cubeMeasures).persist()
    val allRow = cube.filter(ds.cubeDims.map(d => col(d) === "ALL").reduce(_ && _)).collect()
    assert(allRow.length == 1)
    val grand = allRow(0).getDouble(ds.cubeDims.size)
    // Sum of the fully-grouped cells equals the grand total for the first measure.
    val cells = cube.filter(ds.cubeDims.map(d => col(d) =!= "ALL").reduce(_ && _))
      .agg(sum(col(DataCube.measureName(ds.cubeMeasures.head)))).collect()(0).getDouble(0)
    assert(math.abs(grand - cells) < 1e-6)
    cube.unpersist()
    svc.close()
  }

  test("DuckDB GROUPING SETS equals the assembled cube (2 dims)") {
    val ds = Favorita
    val dfs = TestData.dfs(ds, spark)
    val dims = ds.cubeDims.take(2)
    val ms   = ds.cubeMeasures.take(2)
    val svc  = new LmfaoService(spark, ds.tree, dfs)
    val cube = DataCube.compute(svc, dims, ms)
    svc.close()
    val mAggs  = ms.map(m => s"SUM(CAST($m AS DOUBLE)) AS ${DataCube.measureName(m)}").mkString(", ")
    val mNames = ms.map(DataCube.measureName).mkString(", ")
    val dExprs = dims.map(d => s"COALESCE(CAST($d AS VARCHAR), 'ALL') AS $d").mkString(", ")
    Oracle.assertEquivalent(cube,
      s"""SELECT $dExprs, $mNames FROM (
            SELECT ${dims.mkString(", ")}, $mAggs
            FROM ${SqlGen.fromClause(ds.tree)}
            GROUP BY CUBE (${dims.mkString(", ")})
          ) sub""".replaceAll("\\s+", " "),
      TestData.tables(ds, spark): _*)
  }
}
