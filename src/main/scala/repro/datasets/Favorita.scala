package repro.datasets

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{JoinTree, Relation}
import Gen._

/** Synthetic Favorita (Figure 3): star/snowflake around the Sales fact.
  *
  *   Stores — Transactions — Sales — Holiday
  *                Oil ——————/   \—— Items
  *
  * (Edges: Sales–Transactions, Transactions–Stores, Transactions–Oil,
  * Sales–Holiday, Sales–Items; the `date` attribute spans the
  * Holiday–Sales–Transactions–Oil path, satisfying running intersection.)
  * 18 distinct attributes as in Table 1.
  */
object Favorita extends SchemaDataset {
  val name = "Favorita"

  val tree: JoinTree = JoinTree(
    Seq(
      Relation("Sales", Seq("date", "store", "item", "unitsales", "onpromotion")),
      Relation("Transactions", Seq("date", "store", "txns")),
      Relation("Stores", Seq("store", "city", "state", "stype", "cluster")),
      Relation("Oil", Seq("date", "oilprize")),
      Relation("Holiday", Seq("date", "htype", "locale", "localename", "transferred")),
      Relation("Items", Seq("item", "family", "class", "perishable")),
    ),
    Seq("Sales" -> "Transactions", "Transactions" -> "Stores", "Transactions" -> "Oil",
        "Sales" -> "Holiday", "Sales" -> "Items"),
  ).requireValid()

  val fact = "Sales"
  val keys = Seq("date", "store", "item")

  val categorical: Seq[String] = Seq("onpromotion", "city", "state", "stype", "htype",
    "locale", "localename", "transferred", "family", "perishable")
  val continuous: Seq[String] = Seq("unitsales", "txns", "cluster", "oilprize", "class")
  val label = "unitsales"
  val miAttrs: Seq[String] = categorical ++ Seq("cluster", "class")
  val cubeDims: Seq[String] = Seq("city", "family", "htype")
  val cubeMeasures: Seq[String] = Seq("unitsales", "txns", "oilprize", "cluster", "class")

  private val FactBase = 5_000_000L

  def load(spark: SparkSession, sf: Double, seed: Long = 42): Map[String, DataFrame] = {
    val nDates  = scaled(1700, sf, 50).toInt
    val nStores = scaled(550, sf, 10).toInt
    val nItems  = scaled(40000, sf, 150).toInt
    val s = seed

    val sales = spark.range(scaled(FactBase, sf)).select(
      (hint(nDates, s + 1, col("id")) + 1) as "date",
      (hint(nStores, s + 2, col("id")) + 1) as "store",
      (hint(nItems, s + 3, col("id")) + 1) as "item",
      col("id"),
    ).withColumn("unitsales",
      // signal: item class drives demand, plus date/store effect, plus noise
      hint(30, s + 62, col("item")) + hint(15, s + 100, col("date"), col("store")) +
        hint(8, s + 4, col("id")))
      .withColumn("onpromotion", hcat(Seq("f", "t"), s + 5, col("id")))
      .select("date", "store", "item", "unitsales", "onpromotion")

    val transactions = spark.range(nDates.toLong * nStores).select(
      (col("id") / nStores + 1).cast("int") as "date",
      (col("id") % nStores + 1).cast("int") as "store",
      (hint(4000, s + 10, col("id")) + 100) as "txns",
    )

    val stores = spark.range(1, nStores + 1).select(
      col("id").cast("int") as "store",
      hcat((0 until 22).map(i => s"city$i"), s + 20, col("id")) as "city",
      hcat((0 until 16).map(i => s"state$i"), s + 21, col("id")) as "state",
      hcat(Seq("A", "B", "C", "D", "E"), s + 22, col("id")) as "stype",
      (hint(17, s + 23, col("id")) + 1) as "cluster",
    )

    val oil = spark.range(1, nDates + 1).select(
      col("id").cast("int") as "date",
      (hint(60, s + 30, col("id")) + 26) as "oilprize",
    )

    val holiday = spark.range(1, nDates + 1).select(
      col("id").cast("int") as "date",
      hcat(Seq("none", "holiday", "event", "bridge", "workday", "transfer"),
           s + 40, col("id")) as "htype",
      hcat(Seq("national", "regional", "local"), s + 41, col("id")) as "locale",
      hcat((0 until 24).map(i => s"loc$i"), s + 42, col("id")) as "localename",
      hcat(Seq("f", "t"), s + 43, col("id")) as "transferred",
    )

    val items = spark.range(1, nItems + 1).select(
      col("id").cast("int") as "item",
      hcat((0 until 33).map(i => s"family$i"), s + 60, col("id")) as "family",
      // class and perishable reuse the fact's demand-driver hash (seed s+62,
      // int-typed key to match the fact's int item column — Spark's hash()
      // is type-sensitive), so they genuinely predict unitsales.
      (hint(30, s + 62, col("id").cast("int")) * 10 + hint(10, s + 61, col("id"))) as "class",
      (hint(30, s + 62, col("id").cast("int")) % 2) as "perishable",
    )

    Map("Sales" -> sales, "Transactions" -> transactions, "Stores" -> stores,
        "Oil" -> oil, "Holiday" -> holiday, "Items" -> items)
  }
}
