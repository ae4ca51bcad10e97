package repro.datasets

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{JoinTree, Relation}
import Gen._

/** Synthetic Retailer (Appendix A): snowflake around the Inventory fact.
  *
  *   Census — Location — Inventory — Weather
  *                          |
  *                        Item
  *
  * 43 distinct attributes as in the paper (Table 1), 5 of them categorical.
  * The label `inventoryunits` is generated as a deterministic function of the
  * item and (date, store) hashes plus noise, so models trained on dimension
  * attributes carry real signal.
  */
object Retailer extends SchemaDataset {
  val name = "Retailer"

  val tree: JoinTree = JoinTree(
    Seq(
      Relation("Inventory", Seq("locn", "dateid", "ksn", "inventoryunits")),
      Relation("Location", Seq("locn", "zip", "rgn_cd", "clim_zn_nbr", "tot_area_sq_ft",
        "sell_area_sq_ft", "avghhi", "supertargetdistance", "supertargetdrivetime",
        "targetdistance", "targetdrivetime", "walmartdistance", "walmartdrivetime",
        "walmartsupercenterdistance", "walmartsupercenterdrivetime")),
      Relation("Census", Seq("zip", "population", "white", "asian", "pacific", "black",
        "medianage", "occupiedhouseunits", "houseunits", "families", "households",
        "husbwife", "males", "females", "householdschildren", "hispanic")),
      Relation("Weather", Seq("locn", "dateid", "rain", "snow", "maxtemp", "mintemp",
        "meanwind", "thunder")),
      Relation("Item", Seq("ksn", "subcategory", "category", "categoryCluster", "prize")),
    ),
    Seq("Inventory" -> "Location", "Location" -> "Census",
        "Inventory" -> "Weather", "Inventory" -> "Item"),
  ).requireValid()

  val fact = "Inventory"
  val keys = Seq("locn", "dateid", "ksn", "zip")

  val categorical: Seq[String] = Seq("rain", "snow", "thunder", "category", "categoryCluster")
  val continuous: Seq[String] = Seq(
    "inventoryunits", "rgn_cd", "clim_zn_nbr", "tot_area_sq_ft", "sell_area_sq_ft", "avghhi",
    "supertargetdistance", "supertargetdrivetime", "targetdistance", "targetdrivetime",
    "walmartdistance", "walmartdrivetime", "walmartsupercenterdistance",
    "walmartsupercenterdrivetime", "population", "white", "asian", "pacific", "black",
    "medianage", "occupiedhouseunits", "houseunits", "families", "households", "husbwife",
    "males", "females", "householdschildren", "hispanic", "maxtemp", "mintemp", "meanwind",
    "subcategory", "prize")
  val label = "inventoryunits"
  // §B: nine categorical/discrete attributes for mutual information.
  val miAttrs: Seq[String] = Seq("rain", "snow", "thunder", "category", "categoryCluster",
    "rgn_cd", "clim_zn_nbr", "subcategory", "medianage")
  val cubeDims: Seq[String] = Seq("categoryCluster", "rain", "rgn_cd")
  val cubeMeasures: Seq[String] = Seq("inventoryunits", "maxtemp", "mintemp", "meanwind", "prize")

  private val FactBase = 4_000_000L

  def load(spark: SparkSession, sf: Double, seed: Long = 42): Map[String, DataFrame] = {
    val nStores = scaled(1600, sf, 20).toInt
    val nDates  = scaled(1200, sf, 60).toInt
    val nZip    = scaled(800, sf, 15).toInt
    val nSku    = scaled(30000, sf, 120).toInt
    val s = seed

    val inventory = spark.range(scaled(FactBase, sf)).select(
      (hint(nStores, s + 1, col("id")) + 1) as "locn",
      (hint(nDates, s + 2, col("id")) + 1) as "dateid",
      (hint(nSku, s + 3, col("id")) + 1) as "ksn",
      col("id"),
    ).withColumn("inventoryunits",
      // signal: item-driven demand + (date,store)-driven demand + noise
      hint(40, s + 100, col("ksn")) + hint(25, s + 101, col("dateid"), col("locn")) +
        hint(10, s + 4, col("id")))
      .select("locn", "dateid", "ksn", "inventoryunits")

    val location = spark.range(1, nStores + 1).select(
      col("id").cast("int") as "locn",
      (hint(nZip, s + 10, col("id")) + 1) as "zip",
      hint(8, s + 11, col("id")) as "rgn_cd",
      hint(6, s + 12, col("id")) as "clim_zn_nbr",
      (hint(90, s + 13, col("id")) + 10) * 1000 as "tot_area_sq_ft",
      (hint(60, s + 14, col("id")) + 5) * 1000 as "sell_area_sq_ft",
      (hint(80, s + 15, col("id")) + 20) * 1000 as "avghhi",
      hint(200, s + 16, col("id")) as "supertargetdistance",
      hint(120, s + 17, col("id")) as "supertargetdrivetime",
      hint(150, s + 18, col("id")) as "targetdistance",
      hint(100, s + 19, col("id")) as "targetdrivetime",
      hint(80, s + 20, col("id")) as "walmartdistance",
      hint(60, s + 21, col("id")) as "walmartdrivetime",
      hint(180, s + 22, col("id")) as "walmartsupercenterdistance",
      hint(110, s + 23, col("id")) as "walmartsupercenterdrivetime",
    )

    val census = spark.range(1, nZip + 1).select(
      col("id").cast("int") as "zip",
      (hint(500, s + 30, col("id")) + 10) * 100 as "population",
      hint(10000, s + 31, col("id")) as "white",
      hint(5000, s + 32, col("id")) as "asian",
      hint(800, s + 33, col("id")) as "pacific",
      hint(6000, s + 34, col("id")) as "black",
      (hint(45, s + 35, col("id")) + 18) as "medianage",
      hint(8000, s + 36, col("id")) as "occupiedhouseunits",
      hint(9000, s + 37, col("id")) as "houseunits",
      hint(5000, s + 38, col("id")) as "families",
      hint(7000, s + 39, col("id")) as "households",
      hint(4000, s + 40, col("id")) as "husbwife",
      hint(10000, s + 41, col("id")) as "males",
      hint(10000, s + 42, col("id")) as "females",
      hint(3000, s + 43, col("id")) as "householdschildren",
      hint(4000, s + 44, col("id")) as "hispanic",
    )

    val weather = spark.range(nStores.toLong * nDates).select(
      (col("id") / nDates + 1).cast("int") as "locn",
      (col("id") % nDates + 1).cast("int") as "dateid",
      hcat(Seq("no", "yes"), s + 50, col("id")) as "rain",
      hcat(Seq("no", "yes", "heavy"), s + 51, col("id")) as "snow",
      (hint(60, s + 52, col("id")) + 30) as "maxtemp",
      hint(60, s + 53, col("id")) as "mintemp",
      hint(35, s + 54, col("id")) as "meanwind",
      hcat(Seq("no", "yes"), s + 55, col("id")) as "thunder",
    )

    val item = spark.range(1, nSku + 1).select(
      col("id").cast("int") as "ksn",
      hint(32, s + 60, col("id")) as "subcategory",
      hcat((0 until 8).map(i => s"cat$i"), s + 61, col("id")) as "category",
      hcat((0 until 4).map(i => s"cluster$i"), s + 62, col("id")) as "categoryCluster",
      // prize reuses the fact's demand-driver hash (seed s+100, int-typed
      // key) so item price predicts inventoryunits — real model signal.
      (hint(40, s + 100, col("id").cast("int")) * 10 + hint(10, s + 63, col("id")) + 100) as "prize",
    )

    Map("Inventory" -> inventory, "Location" -> location, "Census" -> census,
        "Weather" -> weather, "Item" -> item)
  }
}
