package repro

import org.apache.spark.sql.functions._

/** Coverage for the provided TPC-H-lite generators, oracle-checked on
  * integer-exact aggregates (counts, integer columns).
  */
class SynthDataSpec extends SparkSpec {
  lazy val li = SynthData.lineitem(spark, sf = 0.001).persist()
  lazy val ord = SynthData.orders(spark, sf = 0.001).persist()

  test("lineitem scales with sf") {
    assert(SynthData.lineitem(spark, 0.0005).count() < li.count())
  }

  test("lineitem keys stay in range") {
    val r = li.agg(min("l_orderkey"), max("l_orderkey"), min("l_partkey"), max("l_partkey")).collect()(0)
    assert(r.getLong(0) >= 1 && r.getLong(1) <= 1500 + 1)
    assert(r.getLong(2) >= 1 && r.getLong(3) <= 200 + 1)
  }

  test("oracle: returnflag counts on lineitem") {
    val out = li.groupBy("l_returnflag").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(out,
      "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle: join count lineitem-orders") {
    val j = li.join(ord, li("l_orderkey") === ord("o_orderkey")).agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(j,
      "SELECT COUNT(*) AS n FROM lineitem, orders WHERE l_orderkey = o_orderkey",
      "lineitem" -> li, "orders" -> ord)
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0)
    assert(top.getLong(0) <= 5, "most frequent key should be a small rank")
    assert(top.getLong(1) > 20000 / 1000, "head key far above uniform share")
  }

  test("uniform keys cover the range roughly evenly") {
    val u = SynthData.uniformKeys(spark, 20000, 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 20000 / 10 / 2 && counts.max < 20000 / 10 * 2)
  }
}
