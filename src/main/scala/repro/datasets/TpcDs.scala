package repro.datasets

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{JoinTree, Relation}
import Gen._

/** Synthetic TPC-DS store_sales excerpt (Appendix A, Figure 6(d)): a
  * snowflake of ten relations.
  *
  *   date_dim  item  store  promotion          customer_address
  *        \      |     |     /                  /
  *         \—— store_sales ——— customer ——— customer_demographics
  *                                   \——— household_demographics — income_band
  *
  * The classification label `c_preferred_cust_flag` is a deterministic
  * function of the customer's demographics key plus noise, so the
  * classification-tree workload has real signal through the joins.
  */
object TpcDs extends SchemaDataset {
  val name = "TPC-DS"

  val tree: JoinTree = JoinTree(
    Seq(
      Relation("store_sales", Seq("date_sk", "item_sk", "store_sk", "promo_sk", "customer_sk",
        "ss_quantity", "ss_wholesale_cost", "ss_list_price", "ss_sales_price",
        "ss_ext_discount_amt", "ss_net_paid", "ss_net_profit")),
      Relation("date_dim", Seq("date_sk", "d_year", "d_moy", "d_dom", "d_dow", "d_qoy", "d_holiday")),
      Relation("item", Seq("item_sk", "i_brand", "i_class", "i_category", "i_manufact_id",
        "i_current_price", "i_wholesale_cost")),
      Relation("store", Seq("store_sk", "s_number_employees", "s_floor_space", "s_market_id",
        "s_city", "s_state")),
      Relation("promotion", Seq("promo_sk", "p_channel_email", "p_channel_tv",
        "p_response_target", "p_cost")),
      Relation("customer", Seq("customer_sk", "addr_sk", "cdemo_sk", "hdemo_sk",
        "c_birth_year", "c_birth_month", "c_preferred_cust_flag")),
      Relation("customer_address", Seq("addr_sk", "ca_city", "ca_state", "ca_gmt_offset")),
      Relation("customer_demographics", Seq("cdemo_sk", "cd_gender", "cd_marital_status",
        "cd_education_status", "cd_purchase_estimate", "cd_dep_count")),
      Relation("household_demographics", Seq("hdemo_sk", "ib_sk", "hd_buy_potential",
        "hd_dep_count", "hd_vehicle_count")),
      Relation("income_band", Seq("ib_sk", "ib_lower_bound", "ib_upper_bound")),
    ),
    Seq("store_sales" -> "date_dim", "store_sales" -> "item", "store_sales" -> "store",
        "store_sales" -> "promotion", "store_sales" -> "customer",
        "customer" -> "customer_address", "customer" -> "customer_demographics",
        "customer" -> "household_demographics", "household_demographics" -> "income_band"),
  ).requireValid()

  val fact = "store_sales"
  val keys = Seq("date_sk", "item_sk", "store_sk", "promo_sk", "customer_sk",
    "addr_sk", "cdemo_sk", "hdemo_sk", "ib_sk")

  val categorical: Seq[String] = Seq("d_holiday", "i_brand", "i_class", "i_category",
    "s_city", "s_state", "p_channel_email", "p_channel_tv", "ca_city", "ca_state",
    "cd_gender", "cd_marital_status", "cd_education_status", "hd_buy_potential",
    "c_preferred_cust_flag")
  val continuous: Seq[String] = Seq("ss_quantity", "ss_wholesale_cost", "ss_list_price",
    "ss_sales_price", "ss_ext_discount_amt", "ss_net_paid", "ss_net_profit",
    "d_year", "d_moy", "d_dom", "d_dow", "d_qoy", "i_manufact_id", "i_current_price",
    "i_wholesale_cost", "s_number_employees", "s_floor_space", "s_market_id",
    "p_response_target", "p_cost", "c_birth_year", "c_birth_month", "ca_gmt_offset",
    "cd_purchase_estimate", "cd_dep_count", "hd_dep_count", "hd_vehicle_count",
    "ib_lower_bound", "ib_upper_bound")
  /** Regression-style label for covar/RT workloads; classification uses
    * [[classLabel]].
    */
  val label = "ss_net_profit"
  val classLabel = "c_preferred_cust_flag"
  val miAttrs: Seq[String] = Seq("d_holiday", "i_category", "s_city", "s_state",
    "p_channel_email", "p_channel_tv", "ca_state", "cd_gender", "cd_marital_status",
    "cd_education_status", "hd_buy_potential", "c_preferred_cust_flag", "d_qoy",
    "d_dow", "hd_vehicle_count", "cd_dep_count", "d_moy", "ss_quantity", "ib_sk")
  val cubeDims: Seq[String] = Seq("i_category", "s_state", "d_qoy")
  val cubeMeasures: Seq[String] = Seq("ss_quantity", "ss_sales_price", "ss_net_paid",
    "ss_net_profit", "ss_ext_discount_amt")

  private val FactBase = 2_880_000L // SF10 store_sales ≈ 28.8M → ×0.1 of paper scale

  def load(spark: SparkSession, sf: Double, seed: Long = 42): Map[String, DataFrame] = {
    val nDates = scaled(1200, sf, 50).toInt
    val nItems = scaled(20000, sf, 100).toInt
    val nStores = scaled(400, sf, 6).toInt
    val nPromo = scaled(300, sf, 5).toInt
    val nCust  = scaled(50000, sf, 200).toInt
    val nAddr  = scaled(25000, sf, 100).toInt
    val nCdemo = scaled(2000, sf, 20).toInt
    val nHdemo = scaled(800, sf, 10).toInt
    val nIb    = 20
    val s = seed

    val storeSales = spark.range(scaled(FactBase, sf)).select(
      (hint(nDates, s + 1, col("id")) + 1) as "date_sk",
      (hint(nItems, s + 2, col("id")) + 1) as "item_sk",
      (hint(nStores, s + 3, col("id")) + 1) as "store_sk",
      (hint(nPromo, s + 4, col("id")) + 1) as "promo_sk",
      (hint(nCust, s + 5, col("id")) + 1) as "customer_sk",
      (hint(99, s + 6, col("id")) + 1) as "ss_quantity",
      (hint(90, s + 7, col("id")) + 10) as "ss_wholesale_cost",
      (hint(190, s + 8, col("id")) + 10) as "ss_list_price",
      (hint(180, s + 9, col("id")) + 5) as "ss_sales_price",
      hint(50, s + 10, col("id")) as "ss_ext_discount_amt",
      (hint(15000, s + 11, col("id")) + 100) as "ss_net_paid",
      col("id"),
    ).withColumn("ss_net_profit",
      // signal: item margin + store effect + noise
      hint(60, s + 102, col("item_sk")) + hint(30, s + 103, col("store_sk")) +
        hint(20, s + 12, col("id")) - 40)
      .select("date_sk", "item_sk", "store_sk", "promo_sk", "customer_sk",
        "ss_quantity", "ss_wholesale_cost", "ss_list_price", "ss_sales_price",
        "ss_ext_discount_amt", "ss_net_paid", "ss_net_profit")

    val dateDim = spark.range(1, nDates + 1).select(
      col("id").cast("int") as "date_sk",
      (hint(5, s + 20, col("id")) + 1998) as "d_year",
      (hint(12, s + 21, col("id")) + 1) as "d_moy",
      (hint(28, s + 22, col("id")) + 1) as "d_dom",
      hint(7, s + 23, col("id")) as "d_dow",
      (hint(4, s + 24, col("id")) + 1) as "d_qoy",
      hcat(Seq("N", "Y"), s + 25, col("id")) as "d_holiday",
    )

    val item = spark.range(1, nItems + 1).select(
      col("id").cast("int") as "item_sk",
      hcat((0 until 50).map(i => s"brand$i"), s + 30, col("id")) as "i_brand",
      hcat((0 until 16).map(i => s"iclass$i"), s + 31, col("id")) as "i_class",
      hcat((0 until 10).map(i => s"icat$i"), s + 32, col("id")) as "i_category",
      (hint(1000, s + 33, col("id")) + 1) as "i_manufact_id",
      (hint(290, s + 34, col("id")) + 10) as "i_current_price",
      (hint(190, s + 35, col("id")) + 5) as "i_wholesale_cost",
    )

    val store = spark.range(1, nStores + 1).select(
      col("id").cast("int") as "store_sk",
      (hint(290, s + 40, col("id")) + 10) as "s_number_employees",
      (hint(900, s + 41, col("id")) + 100) * 100 as "s_floor_space",
      (hint(10, s + 42, col("id")) + 1) as "s_market_id",
      hcat((0 until 25).map(i => s"scity$i"), s + 43, col("id")) as "s_city",
      hcat((0 until 15).map(i => s"sstate$i"), s + 44, col("id")) as "s_state",
    )

    val promotion = spark.range(1, nPromo + 1).select(
      col("id").cast("int") as "promo_sk",
      hcat(Seq("N", "Y"), s + 50, col("id")) as "p_channel_email",
      hcat(Seq("N", "Y"), s + 51, col("id")) as "p_channel_tv",
      hint(2, s + 52, col("id")) as "p_response_target",
      (hint(900, s + 53, col("id")) + 100) as "p_cost",
    )

    val customer = spark.range(1, nCust + 1).select(
      col("id").cast("int") as "customer_sk",
      (hint(nAddr, s + 60, col("id")) + 1) as "addr_sk",
      (hint(nCdemo, s + 61, col("id")) + 1) as "cdemo_sk",
      (hint(nHdemo, s + 62, col("id")) + 1) as "hdemo_sk",
      (hint(60, s + 63, col("id")) + 1930) as "c_birth_year",
      (hint(12, s + 64, col("id")) + 1) as "c_birth_month",
    ).withColumn("c_preferred_cust_flag",
      // signal: demographics-driven with noise → learnable through the joins
      when(hint(70, s + 110, col("cdemo_sk")) + hint(50, s + 65, col("customer_sk")) < 60, "Y")
        .otherwise("N"))

    val customerAddress = spark.range(1, nAddr + 1).select(
      col("id").cast("int") as "addr_sk",
      hcat((0 until 40).map(i => s"cacity$i"), s + 70, col("id")) as "ca_city",
      hcat((0 until 20).map(i => s"castate$i"), s + 71, col("id")) as "ca_state",
      (hint(11, s + 72, col("id")) - 10) as "ca_gmt_offset",
    )

    val customerDemographics = spark.range(1, nCdemo + 1).select(
      col("id").cast("int") as "cdemo_sk",
      hcat(Seq("M", "F"), s + 80, col("id")) as "cd_gender",
      hcat(Seq("S", "M", "D", "W", "U"), s + 81, col("id")) as "cd_marital_status",
      hcat(Seq("Primary", "Secondary", "College", "2yrDegree", "4yrDegree", "Advanced"),
           s + 82, col("id")) as "cd_education_status",
      // reuses the preferred-flag hash (seed s+110, int-typed key) so the
      // classification label is learnable from demographics through the join
      (hint(70, s + 110, col("id").cast("int")) + 5) * 100 as "cd_purchase_estimate",
      hint(7, s + 84, col("id")) as "cd_dep_count",
    )

    val householdDemographics = spark.range(1, nHdemo + 1).select(
      col("id").cast("int") as "hdemo_sk",
      (hint(nIb, s + 90, col("id")) + 1) as "ib_sk",
      hcat(Seq("Unknown", "0-500", "501-1000", "1001-5000", "5001-10000", ">10000"),
           s + 91, col("id")) as "hd_buy_potential",
      hint(10, s + 92, col("id")) as "hd_dep_count",
      hint(5, s + 93, col("id")) as "hd_vehicle_count",
    )

    val incomeBand = spark.range(1, nIb + 1).select(
      col("id").cast("int") as "ib_sk",
      (col("id") - 1).cast("int") * 10000 as "ib_lower_bound",
      col("id").cast("int") * 10000 - 1 as "ib_upper_bound",
    )

    Map("store_sales" -> storeSales, "date_dim" -> dateDim, "item" -> item,
        "store" -> store, "promotion" -> promotion, "customer" -> customer,
        "customer_address" -> customerAddress, "customer_demographics" -> customerDemographics,
        "household_demographics" -> householdDemographics, "income_band" -> incomeBand)
  }
}
